package repro

import org.apache.spark.sql.functions._

/** Exercises the provided SynthData generators and the DuckDB oracle on
  * plain SQL aggregations — guards the correctness harness itself.
  */
class OracleSmokeSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.001).cache()

  test("lineitem row count matches DuckDB") {
    Oracle.assertEquivalent(
      li.agg(count(lit(1)) as "n"),
      "SELECT COUNT(*) AS n FROM lineitem",
      "lineitem" -> li)
  }

  test("grouped aggregation matches DuckDB") {
    val q = li.groupBy("l_returnflag")
      .agg(sum("l_quantity") as "qty", count(lit(1)) as "cnt")
      .select(col("l_returnflag"), round(col("qty"), 2) as "qty", col("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag, ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty, COUNT(*) AS cnt
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("join aggregation matches DuckDB") {
    val q = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      q,
      """SELECT o_orderstatus, COUNT(*) AS cnt
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.where(col("k") <= 10).count()
    assert(top > 20000 / 10, s"top-10 keys hold only $top rows") // far above uniform share
  }
}
