package repro.bench

import repro.SparkSpec

/** Table II — per-stage evaluation on YAGO2 (YQ1–YQ4). */
class TableIISuite extends SparkSpec {

  private lazy val rows = StageTable.run(spark, Workloads.yago("bench"), k = 12)
  private def row(q: String) = rows.find(_.query == q).get

  test("Table II renders") {
    println(StageTable.render("Table II: per-stage evaluation on YAGO2 (k=12, hash)", rows))
    assert(rows.size == 4)
  }

  test("YQ2 is provably empty") {
    assert(row("YQ2").matches == 0)
  }

  test("YQ3 dominates LPMs, matches and join cost (the heavy query)") {
    val y3 = row("YQ3")
    assert(y3.lpms == rows.map(_.lpms).max)
    assert(y3.matches == rows.map(_.matches).max)
    assert(y3.matches > 1000)
    // under LO the combinatorial work lands in the LEC stage, so compare
    // the combined LEC+assembly cost
    assert(y3.lecMs + y3.asmMs >= rows.map(r => r.lecMs + r.asmMs).max)
  }

  test("selective YQ1/YQ4 stay small") {
    assert(row("YQ1").matches > 0 && row("YQ1").matches < row("YQ3").matches / 10)
    assert(row("YQ4").matches > 0 && row("YQ4").matches < row("YQ3").matches / 10)
  }

  test("every non-star query ships candidates and LEC features") {
    rows.foreach { r =>
      assert(r.candKB >= 0)
      if (r.lpms > 0) assert(r.lecKB > 0, r.query)
    }
  }
}
