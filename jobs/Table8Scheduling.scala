package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 8 (current-block scheduling strategies). */
object Table8Scheduling {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table8Scheduling")
    println("== Table 8 (current-block scheduling strategies) ==")
    println(Tables.renderTable8(Tables.table8Rows()))
    spark.stop()
  }
}
