package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession bootstrap for the per-table spark-submit entrypoints. */
object JobMain {
  def withSpark(app: String)(body: SparkSession => Unit): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    try body(spark)
    finally spark.stop()
  }
}
