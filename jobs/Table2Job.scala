package repro.jobs

import repro.eval.Tables

/** Reproduces paper Table 2 (PHASE vs PHASE_opt execution time, DBLP). */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table2")
    println(Tables.renderTable2(Tables.table2(spark, Tables.config())))
    spark.stop()
  }
}
