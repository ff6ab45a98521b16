package repro.jobs

import repro.bench.{VariantTable, Workloads}

/** Fig.-9-style ablation entrypoint (Basic / LA / LO / Full). */
object VariantJob {
  def main(args: Array[String]): Unit = {
    val ds = args.headOption.getOrElse("lubm")
    val tier = args.lift(1).getOrElse("bench")
    val spark = JobSession.get(s"variants-$ds")
    try {
      val wl = Workloads.byName(ds, tier)
      println(VariantTable.render(wl.name, VariantTable.run(spark, wl)))
    } finally spark.stop()
  }
}
