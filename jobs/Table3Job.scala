package repro.jobs

import repro.eval.Tables

/** Reproduces paper Table 3 (accuracy of 12 samplers across datasets/kinds). */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table3")
    val grid = Tables.grid(spark, Tables.config(), progress = s => println(s"[grid] $s"))
    println(Tables.renderTable3(grid))
    spark.stop()
  }
}
