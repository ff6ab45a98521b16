package repro.bench

import repro.SparkSpec

/** Fig.-12-style online comparison: gStoreD vs S2RDF / CliqueSquare /
  * DREAM / S2X (supplementary to Tables I–III).
  */
class ComparisonSuite extends SparkSpec {

  private lazy val lubmRows = ComparisonTable.run(spark, Workloads.lubm("bench"), k = 12)
  private lazy val yagoRows = ComparisonTable.run(spark, Workloads.yago("bench"), k = 12)

  test("comparison tables render") {
    println(ComparisonTable.render("LUBM", lubmRows))
    println(ComparisonTable.render("YAGO2", yagoRows))
    assert(lubmRows.nonEmpty && yagoRows.nonEmpty)
  }

  test("every system returns the same match counts per query") {
    (lubmRows ++ yagoRows).groupBy(r => r.query).foreach { case (q, rs) =>
      assert(rs.map(_.matches).distinct.size == 1, s"$q: ${rs.map(r => r.system -> r.matches)}")
    }
  }

  test("gStoreD answers selective star queries fastest or near-fastest") {
    Seq("LQ4", "LQ5").foreach { q =>
      val rs = lubmRows.filter(_.query == q)
      val g = rs.find(_.system == "gStoreD").get.ms
      val best = rs.map(_.ms).min
      assert(g <= best * 5 + 200, s"$q: $rs") // same order of magnitude
    }
  }
}
