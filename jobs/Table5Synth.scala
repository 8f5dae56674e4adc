package repro.jobs

import repro.bench.Tables

/** spark-submit entrypoint reproducing the paper's Table 5 (synthetic graph statistics). */
object Table5Synth {
  def main(args: Array[String]): Unit = {
    implicit val spark = JobSession.create("Table5Synth")
    println("== Table 5 (synthetic graph statistics) ==")
    println(Tables.renderTable5(Tables.table5Rows()))
    spark.stop()
  }
}
