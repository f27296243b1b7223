package repro.spark

import org.apache.spark.sql.SparkSession

/** SparkSession factory for the `jobs/` entrypoints (tests use
  * `repro.SparkSpec` instead).
  */
object LocalSpark {
  def session(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}
