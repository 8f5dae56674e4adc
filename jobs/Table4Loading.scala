package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 4 (block loading methods x partitions). */
object Table4Loading {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table4Loading")
    println("== Table 4 (block loading methods x partitions) ==")
    println(Tables.renderTable4(Tables.table4Rows()))
    spark.stop()
  }
}
