package jobs

import org.apache.spark.sql.SparkSession

/** Shared bootstrap for the table jobs: a local SparkSession configured like
  * the test harness (broadcast joins off, modest shuffle partitions).
  */
object JobMain {
  def withSpark(name: String)(body: SparkSession => Unit): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    try body(spark) finally spark.stop()
  }
}
