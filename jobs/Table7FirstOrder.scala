package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 7 (first-order random walk systems). */
object Table7FirstOrder {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table7FirstOrder")
    println("== Table 7 (first-order random walk systems) ==")
    println(Tables.renderTable7(Tables.table7Rows()))
    spark.stop()
  }
}
