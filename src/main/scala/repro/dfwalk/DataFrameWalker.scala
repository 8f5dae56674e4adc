package repro.dfwalk

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Second-order random walk as a Catalyst dataflow (the repro-hint's
  * "iterative joins with block-based partitioning").
  *
  * Walk state is a DataFrame `(walkId, prev, cur)`; one step is:
  *
  *   1. join state with the adjacency table on `cur = src` (candidate
  *      expansion),
  *   2. left-join against adjacency again on `(prev, cand)` to evaluate the
  *      Node2vec hop distance h ∈ {0, 1, 2} (Eq. 1),
  *   3. weighted sampling per walk via the Gumbel-max trick
  *      (`argmax log(w) − log(−log(U))` samples ∝ w) with a groupBy-max —
  *      no UDFs, pure Spark SQL,
  *   4. optional `repartitionByRange` on the current vertex's block id,
  *      which clusters co-located walks exactly as the disk engines' block
  *      scheduling does.
  *
  * This is the distributed-dataflow rendering of the paper's model and the
  * statistical cross-check for the disk-engine implementations.
  */
object DataFrameWalker {

  /** Symmetric, deduplicated, loop-free adjacency from directed pairs. */
  def adjacency(edges: DataFrame): DataFrame =
    edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst") as "src", col("src") as "dst"))
      .where(col("src") =!= col("dst"))
      .distinct()

  /** One Node2vec step. `stepIdx` seeds the per-step randomness; rows with
    * no neighbors drop out (stuck walks terminate, as in the engines).
    */
  def step(adj: DataFrame, state: DataFrame, p: Double, q: Double,
           seed: Long, stepIdx: Int): DataFrame = {
    // String aliases keep repeated joins against the same adjacency
    // DataFrame unambiguous (the walk loop reuses `adj` every step).
    val cand = state.alias("st").join(adj.alias("ad"), col("st.cur") === col("ad.src"))
      .select(col("st.walkId") as "walkId", col("st.prev") as "prev",
              col("st.cur") as "cur", col("ad.dst") as "cand")
    val weighted = cand.alias("ca")
      .join(adj.alias("pa"),
            col("ca.prev") === col("pa.src") && col("ca.cand") === col("pa.dst"), "left")
      .select(
        col("ca.walkId") as "walkId", col("ca.cur") as "cur", col("ca.cand") as "cand",
        when(col("ca.prev").isNull, lit(1.0))                    // first step: first-order
          .when(col("ca.cand") === col("ca.prev"), lit(1.0 / p)) // h = 0
          .when(col("pa.src").isNotNull, lit(1.0))               // h = 1
          .otherwise(lit(1.0 / q)) as "w",                       // h = 2
      )
    // Gumbel-max: argmax over log(w) + Gumbel(0,1) noise samples ∝ w.
    val scored = weighted.withColumn(
      "score", log(col("w")) - log(-log(rand(seed + stepIdx))))
    scored
      .groupBy(col("walkId"))
      .agg(max(struct(col("score"), col("cand"), col("cur"))) as "top")
      .select(
        col("walkId"),
        col("top.cur") as "prev",
        col("top.cand") as "cur",
      )
  }

  /** Run `len` steps from `sources` (`walkId`, `src`); returns the visit log
    * `(walkId, step, vertex)` with step 0 = the source. When `blockSize > 0`
    * the state is range-repartitioned by `floor(cur / blockSize)` before
    * each step, mimicking the disk engines' block-clustered execution.
    */
  def walk(spark: SparkSession, adj: DataFrame, sources: DataFrame,
           len: Int, p: Double, q: Double, seed: Long,
           blockSize: Int = 0): DataFrame = {
    var state = sources.select(
      col("walkId"), lit(null).cast("int") as "prev", col("src") as "cur")
    var log0 = sources.select(col("walkId"), lit(0) as "step", col("src") as "vertex")
    var s = 1
    while (s <= len) {
      val partitioned =
        if (blockSize > 0)
          state.repartitionByRange(col("cur").divide(blockSize).cast("int"))
        else state
      state = step(adj, partitioned, p, q, seed, s).cache()
      log0 = log0.union(state.select(col("walkId"), lit(s) as "step", col("cur") as "vertex"))
      s += 1
    }
    log0
  }
}
