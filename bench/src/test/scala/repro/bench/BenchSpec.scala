package repro.bench

import org.apache.spark.sql.SparkSession
import repro.SparkSpec

/** Base for the table benchmark suites: shares the root project's
  * SparkSession and exposes it implicitly for the harness. Suites print the
  * full paper-style table (captured by `bench_output.txt`) and assert the
  * paper's qualitative shapes — winners, ratios, crossovers.
  */
trait BenchSpec extends SparkSpec {
  implicit lazy val sparkSession: SparkSession = spark

  def printTable(title: String, body: String): Unit = {
    println()
    println(s"== $title ==")
    println(body)
    println()
  }
}
