package repro.dfwalk

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.graph.GraphGen
import repro.walk.Node2vecModel

class DataFrameWalkerSpec extends SparkSpec {
  import spark.implicits._

  private lazy val edges = GraphGen.erdosRenyi(spark, 60, 260, seed = 91).cache()
  private lazy val adj = DataFrameWalker.adjacency(edges).cache()
  private lazy val g = repro.graph.CsrGraph.fromDataFrame(edges, 60)

  test("adjacency is symmetric, loop-free, and deduplicated (Oracle)") {
    Oracle.assertEquivalent(
      adj.agg(count(lit(1)) as "n"),
      """WITH sym AS (
        |  SELECT CAST(src AS INT) AS src, CAST(dst AS INT) AS dst FROM edges
        |  UNION SELECT CAST(dst AS INT), CAST(src AS INT) FROM edges
        |)
        |SELECT COUNT(*) AS n FROM sym WHERE src <> dst""".stripMargin,
      "edges" -> edges)
  }

  test("adjacency count equals directed CSR entries") {
    assert(adj.count() == g.nEdgesDirected)
  }

  test("every step of a walk is an edge of the graph (Oracle join check)") {
    val sources = (0 until 30).map(v => (v, v)).toDF("walkId", "src")
    val log = DataFrameWalker.walk(spark, adj, sources, len = 4, p = 1, q = 1, seed = 1).cache()
    val steps = log.as("a").join(log.as("b"),
        $"a.walkId" === $"b.walkId" && $"a.step" + 1 === $"b.step")
      .select($"a.vertex" as "src", $"b.vertex" as "dst").cache()
    // Every consecutive pair must appear in the adjacency table.
    Oracle.assertEquivalent(
      steps.join(adj, Seq("src", "dst"), "left_anti").agg(count(lit(1)) as "bad"),
      "SELECT CAST(0 AS BIGINT) AS bad",
    )
  }

  test("walks from non-dangling sources run the full length") {
    val src = (0 until g.nV).filter(g.degree(_) > 0).take(20)
    val sources = src.zipWithIndex.map { case (v, i) => (i, v) }.toDF("walkId", "src")
    // On an undirected graph a walk from a positive-degree source can never
    // get stuck (the edge it arrived by leads back), so all walks run full.
    val log = DataFrameWalker.walk(spark, adj, sources, len = 5, p = 1, q = 1, seed = 2)
    val lens = log.groupBy("walkId").agg(max("step") as "last").collect()
    assert(lens.length == 20)
    lens.foreach(r => assert(r.getAs[Int]("last") == 5))
  }

  test("first-step distribution is uniform over the source's neighbors") {
    val v = (0 until g.nV).maxBy(g.degree)
    val n = 4000
    val sources = (0 until n).map(i => (i, v)).toDF("walkId", "src")
    val s1 = DataFrameWalker.step(adj, sources.select($"walkId", lit(null).cast("int") as "prev", $"src" as "cur"),
                                  p = 1, q = 1, seed = 3, stepIdx = 1)
    val counts = s1.groupBy("cur").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    val d = g.degree(v)
    for (z <- g.neighborsOf(v)) {
      val frac = counts.getOrElse(z, 0L).toDouble / n
      assert(math.abs(frac - 1.0 / d) < 4.0 / math.sqrt(n), s"neighbor $z frac $frac")
    }
  }

  test("second-step distribution matches the exact Node2vec edge-edge law") {
    val model = Node2vecModel(p = 4.0, q = 0.25)
    // Fix an edge (u0, v0) with a reasonably dense neighborhood.
    val u0 = (0 until g.nV).maxBy(g.degree)
    val v0 = g.neighborsOf(u0).maxBy(g.degree)
    val n = 6000
    val state = (0 until n).map(i => (i, u0, v0)).toDF("walkId", "prev", "cur")
    val s = DataFrameWalker.step(adj, state, p = 4.0, q = 0.25, seed = 4, stepIdx = 1)
    val counts = s.groupBy("cur").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    for (z <- g.neighborsOf(v0)) {
      val expect = model.probability(g, u0, v0, z)
      val frac = counts.getOrElse(z, 0L).toDouble / n
      assert(math.abs(frac - expect) < 4.0 / math.sqrt(n) + 0.01, s"z=$z got $frac expected $expect")
    }
  }

  test("block-partitioned walk produces the same per-walk lengths") {
    val sources = (0 until 25).map(v => (v, v % g.nV)).toDF("walkId", "src")
    val plain = DataFrameWalker.walk(spark, adj, sources, 3, 1, 1, seed = 5)
    val blocked = DataFrameWalker.walk(spark, adj, sources, 3, 1, 1, seed = 5, blockSize = 16)
    val a = plain.groupBy("walkId").count().orderBy("walkId").collect().map(_.getLong(1)).toSeq
    val b = blocked.groupBy("walkId").count().orderBy("walkId").collect().map(_.getLong(1)).toSeq
    assert(a == b)
  }

  test("visit log step 0 is exactly the sources") {
    val sources = Seq((0, 5), (1, 9)).toDF("walkId", "src")
    val log = DataFrameWalker.walk(spark, adj, sources, 2, 1, 1, seed = 6)
    val s0 = log.where($"step" === 0).orderBy("walkId").collect().map(r => (r.getInt(0), r.getInt(2))).toSeq
    assert(s0 == Seq((0, 5), (1, 9)))
  }
}
