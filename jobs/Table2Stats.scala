package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 2 (dataset and partition statistics). */
object Table2Stats {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table2Stats")
    println("== Table 2 (dataset and partition statistics) ==")
    println(Tables.renderTable2(Tables.table2Rows()))
    spark.stop()
  }
}
