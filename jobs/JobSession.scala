package repro.jobs

import org.apache.spark.sql.SparkSession

/** Session factory for the job entrypoints: under spark-submit the master
  * comes from the launcher; under `sbt runMain` we fall back to local[*].
  */
object JobSession {
  def get(appName: String): SparkSession = {
    val b = SparkSession.builder().appName(appName)
      .config("spark.ui.enabled", value = false)
    if (!sys.props.contains("spark.master"))
      b.master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    val s = b.getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}
