package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession setup for the spark-submit entrypoints. */
object JobSpark {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.sql.session.timeZone", "UTC")
      .getOrCreate()

  /** Bench scale factor: SF=0.1 (~100k bids) unless overridden. */
  def sf(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(0.1)
}
