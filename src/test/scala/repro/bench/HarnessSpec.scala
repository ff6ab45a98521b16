package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** The table harness pieces that need no SparkSession. */
class HarnessSpec extends AnyFunSuite {

  test("render aligns columns and includes the title") {
    val out = StageTable.format("T", Seq("A", "BBB"), Seq(Seq("x", "y"), Seq("long", "z")))
    val lines = out.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.tail.map(_.length).distinct.size == 1) // aligned
    assert(lines(1).contains("A") && lines(1).contains("BBB"))
  }

  test("StageTable.render marks selective queries with a check") {
    val row = StageTable.Row("Q1", selective = true, 1, 2, 3, 4, 5, 6, 7, 8, 9, 10, 11)
    assert(StageTable.render("t", Seq(row)).contains("√"))
  }

  test("PartitionCostTable.render formats costs") {
    val row = PartitionCostTable.Row("DS", "hash", 10, 1.5, 20, 30.0)
    val out = PartitionCostTable.render(Seq(row))
    assert(out.contains("30.0") && out.contains("hash"))
  }

  test("VariantTable.render flags DNF rows") {
    val row = VariantTable.Row("Q", "lvl", 1, 2, 3, 4, dnf = true)
    assert(VariantTable.render("W", Seq(row)).contains("DNF"))
  }

  test("workloads resolve by name with aliases") {
    assert(Workloads.byName("lubm", "test").name == "LUBM")
    assert(Workloads.byName("YAGO2", "test").name == "YAGO2")
    assert(Workloads.byName("btc", "test").name == "BTC")
    intercept[IllegalArgumentException](Workloads.byName("nope", "test"))
  }

  test("workload tiers scale the graphs") {
    assert(Workloads.lubm("bench").graph.numTriples > 2 * Workloads.lubm("test").graph.numTriples)
  }

  test("every workload carries attribute predicates and queries") {
    Seq(Workloads.lubm("test"), Workloads.yago("test"), Workloads.btc("test")).foreach { wl =>
      assert(wl.attrPreds.nonEmpty)
      assert(wl.queries.nonEmpty)
      // attribute predicates actually occur in the data
      wl.attrPreds.foreach(p => assert(wl.graph.dict.idOpt(p).isDefined, s"${wl.name}: $p"))
    }
  }

  test("benchmark query mix has stars and complex shapes per dataset") {
    val lubm = Workloads.lubm("test").queries
    assert(lubm.count(_._2.isStar) == 3 && lubm.size == 7)
    val yago = Workloads.yago("test").queries
    assert(yago.count(_._2.isStar) == 0 && yago.size == 4)
    val btc = Workloads.btc("test").queries
    assert(btc.count(_._2.isStar) >= 2 && btc.size == 7)
  }
}
