package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 3 (PB vs Bi-Block engine I/O efficiency). */
object Table3BiBlock {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table3BiBlock")
    println("== Table 3 (PB vs Bi-Block engine I/O efficiency) ==")
    println(Tables.renderTable3(Tables.table3Rows()))
    spark.stop()
  }
}
