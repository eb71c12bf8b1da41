package repro.jobs

import repro.eval.Tables

/** Reproduces paper Table 1 (dataset statistics). */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table1")
    println(Tables.renderTable1(Tables.table1(spark, Tables.config())))
    spark.stop()
  }
}
