package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Figure 8 analog (end-to-end three-system comparison). */
object EndToEnd {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("EndToEnd")
    println("== Figure 8 analog (end-to-end three-system comparison) ==")
    println(Tables.renderEndToEnd(Tables.endToEndRows()))
    spark.stop()
  }
}
