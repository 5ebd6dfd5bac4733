package repro.bench

import org.apache.spark.sql.SparkSession

/** SparkSession factory for the `jobs/` entrypoints (spark-submit or
  * `sbt runMain`). Mirrors the test session's settings.
  */
object JobSession {
  def create(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}
