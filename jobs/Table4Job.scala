package repro.jobs

import repro.eval.Tables

/** Reproduces paper Table 4 (execution time of 12 samplers). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table4")
    val grid = Tables.grid(spark, Tables.config(), progress = s => println(s"[grid] $s"))
    println(Tables.renderTable4(grid))
    spark.stop()
  }
}
