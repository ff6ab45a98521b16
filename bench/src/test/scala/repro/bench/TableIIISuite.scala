package repro.bench

import repro.SparkSpec

/** Table III — per-stage evaluation on BTC (BQ1–BQ7). */
class TableIIISuite extends SparkSpec {

  private lazy val rows = StageTable.run(spark, Workloads.btc("bench"), k = 12)
  private def row(q: String) = rows.find(_.query == q).get

  test("Table III renders") {
    println(StageTable.render("Table III: per-stage evaluation on BTC (k=12, hash)", rows))
    assert(rows.size == 7)
  }

  test("selective stars BQ1–BQ3 are communication-free") {
    Seq("BQ1", "BQ2", "BQ3").foreach { q =>
      val r = row(q)
      assert(r.candKB == 0 && r.lecKB == 0 && r.crossing == 0, q)
    }
  }

  test("BQ1 returns exactly one match, BQ2 exactly two (as in the paper)") {
    assert(row("BQ1").matches == 1)
    assert(row("BQ2").matches == 2)
  }

  test("BQ3, BQ6 and BQ7 are empty") {
    Seq("BQ3", "BQ6", "BQ7").foreach(q => assert(row(q).matches == 0, q))
  }

  test("selective complex BQ4/BQ5 return small non-empty results") {
    assert(row("BQ4").matches >= 4 && row("BQ4").matches < 100)
    assert(row("BQ5").matches >= 2 && row("BQ5").matches < 100)
  }

  test("complex queries pay candidate-assembly cost, stars do not") {
    val starCand = Seq("BQ1", "BQ2", "BQ3").map(row(_).candMs).sum
    assert(starCand == 0)
  }
}
