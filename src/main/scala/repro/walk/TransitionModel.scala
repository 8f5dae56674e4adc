package repro.walk

import repro.graph.CsrGraph

/** A random-walk transition model (§2.1).
  *
  * `sampleNext` consumes a single uniform draw `u` and returns the next
  * vertex, or -1 if the walk is stuck (dangling vertex). The first step of a
  * walk has `prev = -1` and is first-order for every model — Node2vec's
  * edge-edge distribution needs an incoming edge, so its initial transition
  * is the DeepWalk distribution, exactly as in the original Node2vec
  * sampling procedure.
  */
sealed trait TransitionModel {
  def isSecondOrder: Boolean

  def sampleNext(g: CsrGraph, prev: Int, cur: Int, u: Double): Int

  /** Exact transition probability p(z | prev→cur); reference for tests. */
  def probability(g: CsrGraph, prev: Int, cur: Int, z: Int): Double
}

/** First-order uniform model (unweighted DeepWalk): p(z|v) = 1/|N(v)|. */
case object DeepWalkModel extends TransitionModel {
  val isSecondOrder = false

  def sampleNext(g: CsrGraph, prev: Int, cur: Int, u: Double): Int = {
    val d = g.degree(cur)
    if (d == 0) -1 else g.neighbor(cur, math.min(d - 1, (u * d).toInt))
  }

  def probability(g: CsrGraph, prev: Int, cur: Int, z: Int): Double =
    if (g.hasEdge(cur, z)) 1.0 / g.degree(cur) else 0.0
}

/** Second-order Node2vec model (Eq. 1): biased weight 1/p if the candidate
  * is the previous vertex (h=0), 1 if it neighbors the previous vertex
  * (h=1), 1/q otherwise (h=2); normalized over N(cur).
  */
final case class Node2vecModel(p: Double, q: Double) extends TransitionModel {
  require(p > 0 && q > 0, "p and q must be positive")
  val isSecondOrder = true

  @inline private def weight(g: CsrGraph, prev: Int, z: Int): Double =
    if (z == prev) 1.0 / p
    else if (g.hasEdge(prev, z)) 1.0
    else 1.0 / q

  def sampleNext(g: CsrGraph, prev: Int, cur: Int, u: Double): Int = {
    val d = g.degree(cur)
    if (d == 0) return -1
    if (prev < 0) return g.neighbor(cur, math.min(d - 1, (u * d).toInt))
    var total = 0.0
    var i = 0
    while (i < d) { total += weight(g, prev, g.neighbor(cur, i)); i += 1 }
    val target = u * total
    var acc = 0.0
    i = 0
    while (i < d - 1) {
      acc += weight(g, prev, g.neighbor(cur, i))
      if (target < acc) return g.neighbor(cur, i)
      i += 1
    }
    g.neighbor(cur, d - 1)
  }

  def probability(g: CsrGraph, prev: Int, cur: Int, z: Int): Double = {
    if (!g.hasEdge(cur, z)) return 0.0
    val d = g.degree(cur)
    if (prev < 0) return 1.0 / d
    var total = 0.0
    var i = 0
    while (i < d) { total += weight(g, prev, g.neighbor(cur, i)); i += 1 }
    weight(g, prev, z) / total
  }
}
