package repro.bench

import repro.SparkSpec

/** Table I — per-stage evaluation on LUBM (LQ1–LQ7). */
class TableISuite extends SparkSpec {

  private lazy val rows = StageTable.run(spark, Workloads.lubm("bench"), k = 12)
  private def row(q: String) = rows.find(_.query == q).get

  test("Table I renders") {
    println(StageTable.render("Table I: per-stage evaluation on LUBM (k=12, hash)", rows))
    assert(rows.size == 7)
  }

  test("star queries (LQ2, LQ4, LQ5) ship nothing and have no crossing matches") {
    Seq("LQ2", "LQ4", "LQ5").foreach { q =>
      val r = row(q)
      assert(r.candKB == 0 && r.lecKB == 0, q)
      assert(r.crossing == 0 && r.lpms == 0, q)
    }
  }

  test("unselective star LQ2 has the largest match count") {
    assert(row("LQ2").matches == rows.map(_.matches).max)
    assert(row("LQ2").matches > 1000)
  }

  test("selective stars LQ4/LQ5 return small fixed results") {
    assert(row("LQ4").matches == 2) // 2 full professors per department
    assert(row("LQ5").matches == 12) // gradsPerDept at bench scale
  }

  test("LQ3 is empty and candidate assembly keeps its LPM count tiny") {
    val r = row("LQ3")
    assert(r.matches == 0 && r.crossing == 0)
    assert(r.lpms < row("LQ1").lpms / 10)
  }

  test("complex unselective queries dominate LPM counts (LQ1, LQ7)") {
    Seq("LQ1", "LQ7").foreach { q =>
      val r = row(q)
      assert(r.lpms > 1000, q)
      assert(r.matches > 0 && r.crossing > 0, q)
      assert(r.lecKB > 0 && r.candKB > 0, q)
    }
  }

  test("selective complex LQ6 is cheaper than unselective LQ1/LQ7") {
    assert(row("LQ6").lpms < row("LQ1").lpms)
    assert(row("LQ6").lpms < row("LQ7").lpms)
    assert(row("LQ6").matches > 0)
  }

  test("crossing matches never exceed total matches") {
    rows.foreach(r => assert(r.crossing <= r.matches))
  }
}
