package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entry points. */
object JobSpark {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .config("spark.driver.host", "127.0.0.1")
      .getOrCreate()

  /** Bench-scale graph scale factor (1.0 unless overridden). */
  def scale: Double = sys.env.get("REPRO_SCALE").map(_.toDouble).getOrElse(1.0)

  /** Runs per measurement (paper: 30; default here 10 for wall-clock). */
  def runs: Int = sys.env.get("REPRO_RUNS").map(_.toInt).getOrElse(10)
}
