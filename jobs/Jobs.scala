package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared bootstrap for the spark-submit entrypoints (one per paper table). */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def timed[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  def fmtTime(s: Double): String = {
    val m = (s / 60).toInt
    f"${m}m${s - m * 60}%04.1fs"
  }
}
