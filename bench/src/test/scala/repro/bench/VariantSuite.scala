package repro.bench

import repro.SparkSpec

/** Fig.-9-style ablation: gStoreD-Basic / -LA / -LO / full gStoreD on the
  * non-star LUBM queries (supplementary to Tables I–III).
  */
class VariantSuite extends SparkSpec {

  private lazy val rows = VariantTable.run(spark, Workloads.lubm("bench"), k = 12)
  private def of(q: String, lvl: String) = rows.find(r => r.query == q && r.level == lvl).get

  test("ablation table renders") {
    println(VariantTable.render("LUBM", rows))
    assert(rows.nonEmpty)
  }

  test("all non-DNF levels agree on match counts") {
    rows.groupBy(_.query).foreach { case (q, rs) =>
      val counts = rs.filterNot(_.dnf).map(_.matches).distinct
      assert(counts.size == 1, s"$q: $rs")
    }
  }

  test("LEC grouping shrinks the assembly join space vs Basic") {
    rows.groupBy(_.query).foreach { case (q, rs) =>
      val basic = rs.find(_.level == "gStoreD-Basic").get
      val la = rs.find(_.level == "gStoreD-LA").get
      assert(basic.dnf || basic.pairTests >= la.pairTests, q)
    }
  }

  test("LEC cuts the heavy queries' join space by orders of magnitude") {
    // wall-clock at this scale is dominated by fixed Spark overheads; the
    // paper's Fig.-9 gap comes from the join space, which we measure
    // directly: Basic pays >=10x the pairwise tests of the LEC path (or
    // blows its budget entirely)
    Seq("LQ1", "LQ7").foreach { q =>
      val basic = of(q, "gStoreD-Basic")
      val la = of(q, "gStoreD-LA")
      assert(basic.dnf || basic.pairTests >= 10 * math.max(1, la.pairTests), q)
    }
  }

  test("candidate assembly prunes LPMs on the selective complex query") {
    val lo = of("LQ3", "gStoreD-LO")
    val full = of("LQ3", "gStoreD")
    assert(full.lpms <= lo.lpms)
  }
}
