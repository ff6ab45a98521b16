package repro.jobs

import repro.bench.{ComparisonTable, Workloads}

/** Fig.-12-style online comparison entrypoint (gStoreD vs baselines). */
object ComparisonJob {
  def main(args: Array[String]): Unit = {
    val ds = args.headOption.getOrElse("lubm")
    val tier = args.lift(1).getOrElse("bench")
    val spark = JobSession.get(s"comparison-$ds")
    try {
      val wl = Workloads.byName(ds, tier)
      println(ComparisonTable.render(wl.name, ComparisonTable.run(spark, wl)))
    } finally spark.stop()
  }
}
