package repro.jobs

import repro.bench.{PartitionCostTable, Workloads}

/** Table IV entrypoint: partitioning costs for YAGO2 and LUBM. */
object PartitionCostJob {
  def main(args: Array[String]): Unit = {
    val tier = args.headOption.getOrElse("bench")
    val k = args.lift(1).map(_.toInt).getOrElse(12)
    val spark = JobSession.get("partition-cost")
    try {
      val rows = Seq(Workloads.yago(tier), Workloads.lubm(tier))
        .flatMap(wl => PartitionCostTable.run(spark, wl, k))
      println(PartitionCostTable.render(rows))
    } finally spark.stop()
  }
}
