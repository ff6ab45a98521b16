package repro.jobs

import repro.bench.{StageTable, Workloads}

/** Tables I–III entrypoint: `spark-submit --class repro.jobs.StageTableJob
  * repro.jar [lubm|yago|btc] [tier] [k]`.
  */
object StageTableJob {
  def main(args: Array[String]): Unit = {
    val ds = args.headOption.getOrElse("lubm")
    val tier = args.lift(1).getOrElse("bench")
    val k = args.lift(2).map(_.toInt).getOrElse(12)
    val spark = JobSession.get(s"stage-table-$ds")
    try {
      val wl = Workloads.byName(ds, tier)
      val rows = StageTable.run(spark, wl, k)
      println(StageTable.render(s"Per-stage evaluation on ${wl.name} (k=$k)", rows))
    } finally spark.stop()
  }
}
