package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entrypoints. */
object JobSession {
  def local(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()

  /** Optional size override: --scale 0.1 shrinks every dataset 10x. */
  def scaleOf(args: Array[String]): Double =
    args.sliding(2).collectFirst { case Array("--scale", v) => v.toDouble }
      .getOrElse(1.0)

  def scaled(n: Long, scale: Double): Option[Long] =
    if (scale >= 1.0) None else Some(math.max(500L, (n * scale).toLong))
}
