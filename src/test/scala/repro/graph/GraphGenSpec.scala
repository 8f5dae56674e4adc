package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class GraphGenSpec extends SparkSpec {
  import spark.implicits._

  test("erdosRenyi produces the requested pair count in range") {
    val df = GraphGen.erdosRenyi(spark, nV = 500, nPairs = 2000, seed = 1).cache()
    assert(df.count() == 2000)
    val mm = df.agg(min("src"), max("src"), min("dst"), max("dst")).head
    assert(mm.getInt(0) >= 0 && mm.getInt(1) < 500 && mm.getInt(2) >= 0 && mm.getInt(3) < 500)
  }

  test("erdosRenyi is deterministic in its seed") {
    val a = GraphGen.erdosRenyi(spark, 300, 1000, seed = 7).collect().toSeq
    val b = GraphGen.erdosRenyi(spark, 300, 1000, seed = 7).collect().toSeq
    assert(a == b)
  }

  test("circulant graph has exact degree 2k everywhere") {
    val g = CsrGraph.fromDataFrame(GraphGen.circulant(spark, 200, k = 5), 200)
    assert((0 until 200).forall(g.degree(_) == 10))
    assert(g.nEdgesUndirected == 200 * 5)
  }

  test("circulant connects v to v±1..±k") {
    val g = CsrGraph.fromDataFrame(GraphGen.circulant(spark, 50, k = 3), 50)
    for (off <- 1 to 3) assert(g.hasEdge(0, off) && g.hasEdge(0, 50 - off))
    assert(!g.hasEdge(0, 4))
  }

  test("sbm densities approximate pIn and pOut") {
    val nBlocks = 4; val bs = 60
    val df = GraphGen.sbm(spark, nBlocks, bs, pIn = 0.5, pOut = 0.05, seed = 3).cache()
    val in = df.where(floor($"src" / bs) === floor($"dst" / bs)).count().toDouble
    val out = df.count() - in
    val inPairs = nBlocks * bs * (bs - 1) / 2.0
    val outPairs = nBlocks * (nBlocks - 1) / 2.0 * bs * bs
    assert(math.abs(in / inPairs - 0.5) < 0.05, s"pIn ${in / inPairs}")
    assert(math.abs(out / outPairs - 0.05) < 0.01, s"pOut ${out / outPairs}")
  }

  test("sbm emits only ordered pairs without self-loops") {
    val df = GraphGen.sbm(spark, 2, 30, 0.4, 0.1, seed = 4)
    assert(df.where($"src" >= $"dst").count() == 0)
  }

  test("sbm with pIn=1, pOut=0 in one block is the complete graph") {
    val g = CsrGraph.fromDataFrame(GraphGen.sbm(spark, 1, 40, 1.0, 0.0, seed = 5), 40)
    assert(g.nEdgesUndirected == 40 * 39 / 2)
    assert((0 until 40).forall(g.degree(_) == 39))
  }

  test("rmat vertex ids stay within 2^levels") {
    val df = GraphGen.rmat(spark, levels = 8, nPairs = 3000, a = 0.57, b = 0.19, c = 0.19, seed = 6).cache()
    val mm = df.agg(max("src"), max("dst"), min("src"), min("dst")).head
    assert(mm.getInt(0) < 256 && mm.getInt(1) < 256 && mm.getInt(2) >= 0 && mm.getInt(3) >= 0)
  }

  test("rmat with skewed quadrants is skewed (top vertex well above average)") {
    val g = CsrGraph.fromDataFrame(
      GraphGen.rmat(spark, levels = 10, nPairs = 20000, a = 0.57, b = 0.19, c = 0.19, seed = 7), 1024)
    val degs = (0 until g.nV).map(g.degree)
    assert(degs.max > 8 * (degs.sum.toDouble / degs.count(_ > 0)), s"max=${degs.max}")
  }

  test("rmat rejects invalid quadrant probabilities") {
    assertThrows[IllegalArgumentException](
      GraphGen.rmat(spark, 4, 10, a = 0.8, b = 0.3, c = 0.2, seed = 1))
  }

  test("locality graph concentrates edges near the diagonal") {
    val df = GraphGen.locality(spark, nV = 2000, nPairs = 10000, window = 20, longFrac = 0.05, seed = 8).cache()
    val near = df.where(abs($"src" - $"dst") <= 100 || abs($"src" - $"dst") >= 1900).count()
    assert(near.toDouble / df.count() > 0.85, s"near fraction ${near.toDouble / df.count()}")
  }

  test("locality graph yields much lower sequential edge-cut than ER") {
    val loc = CsrGraph.fromDataFrame(
      GraphGen.locality(spark, 2000, 10000, window = 20, longFrac = 0.05, seed = 9), 2000)
    val er = CsrGraph.fromDataFrame(GraphGen.erdosRenyi(spark, 2000, 10000, seed = 10), 2000)
    val cutLoc = BlockedGraph.sequential(loc, 8).edgeCut
    val cutEr = BlockedGraph.sequential(er, 8).edgeCut
    assert(cutLoc < cutEr / 2, s"loc=$cutLoc er=$cutEr")
  }

  test("clusteredWeb concentrates most edges inside contiguous clusters") {
    val nV = 4000
    val g = CsrGraph.fromDataFrame(
      GraphGen.clusteredWeb(spark, nV, nPairs = 20000, meanCluster = 150, intraFrac = 0.9, seed = 14), nV)
    // Intra-cluster edges have span below ~1.6x the mean cluster size.
    var near = 0L
    for (v <- 0 until nV; z <- g.neighborsOf(v)) if (math.abs(v - z) < 240) near += 1
    assert(near.toDouble / g.nEdgesDirected > 0.8, s"near fraction ${near.toDouble / g.nEdgesDirected}")
  }

  test("clusteredWeb sequential cut is moderate; snapped boundaries cut it sharply") {
    val nV = 6000
    val g = CsrGraph.fromDataFrame(
      GraphGen.clusteredWeb(spark, nV, nPairs = 40000, meanCluster = 450, intraFrac = 0.9, seed = 15), nV)
    val seqCut = BlockedGraph.sequential(g, 10).edgeCut
    val snapCut = Partitioner.snappedSequential(g, 10).edgeCut
    assert(seqCut > 0.12, s"seq cut $seqCut")        // boundaries split clusters
    assert(snapCut < seqCut * 0.7, s"snap $snapCut vs seq $seqCut")
  }

  test("clusteredWeb rejects bad cluster sizes") {
    assertThrows[IllegalArgumentException](
      GraphGen.clusteredWeb(spark, 100, 10, meanCluster = 1, intraFrac = 0.5, seed = 1))
  }

  test("barabasiAlbert has nV*m - m(m+1)/2 + seed-clique edges and power-law head") {
    val nV = 2000; val m = 4
    val g = CsrGraph.fromDataFrame(GraphGen.barabasiAlbert(spark, nV, m, seed = 11), nV)
    // Each vertex beyond the seed clique adds m distinct edges.
    val expected = m * (m + 1) / 2 + (nV - m - 1) * m
    assert(math.abs(g.nEdgesUndirected - expected) <= expected / 100)
    val degs = (0 until nV).map(g.degree)
    assert(degs.max > 10 * m, s"hub degree ${degs.max}") // preferential attachment head
  }

  test("barabasiAlbert rejects bad parameters") {
    assertThrows[IllegalArgumentException](GraphGen.barabasiAlbert(spark, 5, 5, 1))
    assertThrows[IllegalArgumentException](GraphGen.barabasiAlbert(spark, 5, 0, 1))
  }

  test("degrees DataFrame matches DuckDB (Oracle)") {
    val edges = GraphGen.erdosRenyi(spark, 50, 300, seed = 12).cache()
    val deg = GraphGen.degrees(edges)
    Oracle.assertEquivalent(
      deg,
      """WITH sym AS (
        |  SELECT CAST(src AS INT) AS v, CAST(dst AS INT) AS w FROM edges
        |  UNION SELECT CAST(dst AS INT), CAST(src AS INT) FROM edges
        |)
        |SELECT v, COUNT(*) AS degree FROM sym WHERE v <> w GROUP BY v""".stripMargin,
      "edges" -> edges)
  }

  test("degrees agree with the CSR builder's degrees") {
    val edges = GraphGen.erdosRenyi(spark, 80, 400, seed = 13).cache()
    val g = CsrGraph.fromDataFrame(edges, 80)
    val fromDf = GraphGen.degrees(edges).collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    for (v <- 0 until 80)
      assert(fromDf.getOrElse(v, 0L) == g.degree(v).toLong, s"vertex $v")
  }
}
