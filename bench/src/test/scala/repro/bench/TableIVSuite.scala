package repro.bench

import repro.SparkSpec

/** Table IV — Cost_Partitioning of hash / semantic hash / METIS-like on
  * YAGO2 and LUBM.
  */
class TableIVSuite extends SparkSpec {

  private lazy val rows =
    PartitionCostTable.run(spark, Workloads.yago("bench"), k = 12) ++
      PartitionCostTable.run(spark, Workloads.lubm("bench"), k = 12)

  private def cost(ds: String, p: String) =
    rows.find(r => r.dataset == ds && r.partitioner == p).get.cost

  test("Table IV renders") {
    println(PartitionCostTable.render(rows))
    assert(rows.size == 6)
  }

  test("LUBM: semantic hash beats plain hash (per-university domains)") {
    assert(cost("LUBM", "semantic") < cost("LUBM", "hash"))
  }

  test("YAGO2: semantic hash is on par with hash (single namespace)") {
    val ratio = cost("YAGO2", "semantic") / cost("YAGO2", "hash")
    assert(ratio > 0.5 && ratio < 2.0, ratio)
  }

  test("METIS-like is edge-imbalanced relative to hash") {
    val mh = rows.find(r => r.dataset == "YAGO2" && r.partitioner == "metis").get.maxFragEdges
    val hh = rows.find(r => r.dataset == "YAGO2" && r.partitioner == "hash").get.maxFragEdges
    assert(mh > hh)
  }

  test("all costs are positive and finite") {
    rows.foreach(r => assert(r.cost > 0 && !r.cost.isInfinite))
  }
}
