package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entrypoints. */
object JobSession {
  def build(name: String): SparkSession =
    SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()

  /** First arg as corpus size, with a default. */
  def intArg(args: Array[String], i: Int, default: Int): Int =
    if (args.length > i) args(i).toInt else default
}
