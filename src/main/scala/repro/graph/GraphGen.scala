package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.IntegerType

/** Deterministic synthetic graph generators, expressed as Spark DataFrame
  * computations (every generator is a pure function of its seed).
  *
  * These substitute the paper's datasets:
  *   - Erdős–Rényi (`RandomG*` in Table 5),
  *   - circulant graphs (`CirculantG`),
  *   - stochastic block model (`SBM1..3`),
  *   - R-MAT / Kronecker power-law graphs (Twitter/Kron29 analogs),
  *   - Barabási–Albert scale-free (`BASF`, LiveJournal analog),
  *   - a high-locality "web-like" generator (UK200705/CrawlWeb analogs,
  *     reproducing their low sequential edge-cut in Table 2).
  *
  * All return a DataFrame with Int columns `src`, `dst` of directed pairs;
  * `CsrGraph.fromDataFrame` symmetrizes/dedupes, so the realized undirected
  * edge count is slightly below the nominal pair count (collisions).
  */
object GraphGen {

  /** Erdős–Rényi G(n, m)-style: `nPairs` uniform random pairs. */
  def erdosRenyi(spark: SparkSession, nV: Int, nPairs: Long, seed: Long): DataFrame =
    spark.range(nPairs).select(
      (rand(seed) * nV).cast(IntegerType) as "src",
      (rand(seed + 1) * nV).cast(IntegerType) as "dst",
    )

  /** Circulant graph: vertex `v` connects to `v ± 1 .. v ± k (mod nV)`. */
  def circulant(spark: SparkSession, nV: Int, k: Int): DataFrame = {
    val offs = (1 to k).map(lit(_))
    spark.range(nV).select(col("id").cast(IntegerType) as "src",
                           explode(array(offs: _*)) as "off")
      .select(col("src"), ((col("src") + col("off")) % nV).cast(IntegerType) as "dst")
  }

  /** Stochastic block model: `nBlocks` equal blocks of `blockSize` vertices;
    * edge probability `pIn` within a block and `pOut` across blocks.
    * Materialized by filtering the (small, dense) cross join — the paper's
    * SBM graphs are extremely dense, so this is the honest construction.
    *
    * Note: `rand` is materialized in its own projection before use — a
    * nondeterministic column referenced twice is evaluated twice, which
    * silently decorrelates the draws.
    */
  def sbm(spark: SparkSession, nBlocks: Int, blockSize: Int,
          pIn: Double, pOut: Double, seed: Long): DataFrame = {
    val nV = nBlocks * blockSize
    val v  = spark.range(nV).select(col("id").cast(IntegerType) as "v")
    v.as("a").crossJoin(v.as("b"))
      .select(col("a.v") as "src", col("b.v") as "dst", rand(seed) as "u")
      .where(col("src") < col("dst"))
      .where(
        when(floor(col("src") / blockSize) === floor(col("dst") / blockSize),
             col("u") < pIn)
          .otherwise(col("u") < pOut))
      .select(col("src"), col("dst"))
  }

  /** R-MAT (Kronecker) generator with partition probabilities (a, b, c, d).
    * Each of the `levels` bit positions of (src, dst) is drawn from the
    * 2x2 quadrant distribution — pure column expressions, no UDFs.
    */
  def rmat(spark: SparkSession, levels: Int, nPairs: Long,
           a: Double, b: Double, c: Double, seed: Long): DataFrame = {
    require(a + b + c <= 1.0, "quadrant probabilities must sum to <= 1")
    var df = spark.range(nPairs).select(lit(0) as "src", lit(0) as "dst")
    var l = 0
    while (l < levels) {
      // Materialize the level's draw first: a nondeterministic column used in
      // several expressions would otherwise be re-evaluated per occurrence.
      val withR = df.select(col("src"), col("dst"), rand(seed + l) as "r")
      val r = col("r")
      // Quadrants: [0,a)=00, [a,a+b)=01 (dst bit), [a+b,a+b+c)=10 (src bit), rest=11.
      val srcBit = (r >= a + b).cast(IntegerType)
      val dstBit = ((r >= a && r < a + b) || (r >= a + b + c)).cast(IntegerType)
      df = withR.select(
        (col("src") * 2 + srcBit) as "src",
        (col("dst") * 2 + dstBit) as "dst",
      )
      l += 1
    }
    df.select(col("src").cast(IntegerType), col("dst").cast(IntegerType))
  }

  /** Web-like locality graph: most edges connect vertices whose IDs are close
    * (drawn from a two-sided geometric-ish offset), a small fraction are
    * uniform long links. Under sequential blocking this yields the low
    * edge-cut the paper reports for UK200705 (32.5%, Table 2).
    *
    * @param window     scale of the local offset (vertices)
    * @param longFrac   fraction of uniform long-range pairs
    */
  def locality(spark: SparkSession, nV: Int, nPairs: Long,
               window: Int, longFrac: Double, seed: Long): DataFrame = {
    // Materialize every random draw once (see `sbm` note), then derive the
    // destination: a two-sided exponential offset around the source, or a
    // uniform long link with probability `longFrac`.
    spark.range(nPairs).select(
      (rand(seed) * nV).cast(IntegerType) as "src",
      ceil(-log(lit(1.0) - rand(seed + 1)) * window).cast(IntegerType) as "mag",
      (rand(seed + 2) < 0.5) as "neg",
      (rand(seed + 3) * nV).cast(IntegerType) as "far",
      (rand(seed + 4) < longFrac) as "isFar",
    ).select(
      col("src"),
      when(col("isFar"), col("far"))
        .otherwise(pmod(
          col("src") + when(col("neg"), -1).otherwise(1) * greatest(col("mag"), lit(1)),
          lit(nV)))
        .cast(IntegerType) as "dst",
    )
  }

  /** Clustered web graph (UK/CrawlWeb analog): vertices form ID-contiguous
    * clusters ("hosts") of irregular sizes around `meanCluster`; a fraction
    * `intraFrac` of edges is uniform inside the source's cluster, the rest
    * are uniform global links. Byte-balanced sequential block boundaries
    * fall mid-cluster and pay ~1/3 of the split cluster's intra edges —
    * reproducing UK200705's moderate sequential edge-cut — while a
    * partitioner that snaps boundaries to cluster gaps (as METIS in §7.5)
    * removes almost all intra-cluster cut.
    */
  def clusteredWeb(spark: SparkSession, nV: Int, nPairs: Long, meanCluster: Int,
                   intraFrac: Double, seed: Long): DataFrame = {
    require(meanCluster >= 2 && meanCluster < nV, "bad mean cluster size")
    // Deterministic irregular cluster sizes (0.4x .. 1.6x the mean).
    val rng = new java.util.Random(seed)
    val starts = scala.collection.mutable.ArrayBuffer(0)
    while (starts.last < nV) {
      val size = math.max(2, (meanCluster * (0.4 + 1.2 * rng.nextDouble())).toInt)
      starts += math.min(nV, starts.last + size)
    }
    import spark.implicits._
    val vmap = (0 until starts.length - 1).flatMap { c =>
      (starts(c) until starts(c + 1)).map(v => (v, starts(c), starts(c + 1) - starts(c)))
    }.toDF("v", "clStart", "clSize")
    val pairs = spark.range(nPairs).select(
      (rand(seed + 1) * nV).cast(IntegerType) as "src",
      (rand(seed + 2) < intraFrac) as "isIntra",
      rand(seed + 3) as "r2",
      (rand(seed + 4) * nV).cast(IntegerType) as "far",
    )
    pairs.join(vmap, pairs("src") === vmap("v"))
      .select(
        col("src"),
        when(col("isIntra"),
             (col("clStart") + floor(col("r2") * col("clSize"))).cast(IntegerType))
          .otherwise(col("far")) as "dst",
      )
  }

  /** Barabási–Albert preferential attachment: each new vertex attaches `m`
    * edges to endpoints sampled from the degree-proportional repeated-node
    * list. The process is inherently sequential, so it is generated locally
    * and parallelized into a DataFrame (documented substitution — NetworkX
    * in the paper is also a sequential in-memory generator).
    */
  def barabasiAlbert(spark: SparkSession, nV: Int, m: Int, seed: Long): DataFrame = {
    require(nV > m && m >= 1, "need nV > m >= 1")
    val rng = new java.util.Random(seed)
    val repeated = new scala.collection.mutable.ArrayBuffer[Int](2 * nV * m)
    val srcs = new scala.collection.mutable.ArrayBuffer[Int](nV * m)
    val dsts = new scala.collection.mutable.ArrayBuffer[Int](nV * m)
    // Seed clique over the first m+1 vertices.
    var i = 0
    while (i <= m) {
      var j = i + 1
      while (j <= m) {
        srcs += i; dsts += j; repeated += i; repeated += j; j += 1
      }
      i += 1
    }
    var v = m + 1
    while (v < nV) {
      val chosen = new scala.collection.mutable.HashSet[Int]
      while (chosen.size < m) chosen += repeated(rng.nextInt(repeated.length))
      chosen.foreach { t => srcs += v; dsts += t; repeated += v; repeated += t }
      v += 1
    }
    import spark.implicits._
    srcs.zip(dsts).toSeq.toDF("src", "dst")
  }

  /** Degree DataFrame (undirected semantics) for a directed-pair edge set:
    * used by Table 2/5 statistics and Oracle-validated in tests.
    */
  def degrees(edges: DataFrame): DataFrame = {
    val sym = edges.select(col("src") as "v", col("dst") as "w")
      .union(edges.select(col("dst") as "v", col("src") as "w"))
      .where(col("v") =!= col("w")).distinct()
    sym.groupBy("v").agg(count(lit(1)) as "degree")
  }
}
