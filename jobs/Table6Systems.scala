package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 6 (SOGW vs SGSC vs GraSorw on synthetic graphs). */
object Table6Systems {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table6Systems")
    println("== Table 6 (SOGW vs SGSC vs GraSorw on synthetic graphs) ==")
    println(Tables.renderTable6(Tables.table6Rows()))
    spark.stop()
  }
}
