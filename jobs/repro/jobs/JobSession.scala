package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entrypoints. */
object JobSession {
  /** Local-mode session mirroring the test configuration. */
  def build(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
}
