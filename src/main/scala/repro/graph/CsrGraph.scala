package repro.graph

import org.apache.spark.sql.DataFrame

/** Immutable in-memory CSR (Compressed Sparse Row) adjacency, mirroring the
  * on-disk layout of the paper's Figure 6 (an index file of offsets plus a
  * flat neighbor array).
  *
  * Adjacency lists are sorted so that `hasEdge` — which Node2vec needs to
  * decide whether the candidate vertex is one hop from the previous vertex —
  * is a binary search. Vertices are dense `0 until nV` Ints; all graphs in
  * this reproduction are undirected and unweighted, matching the paper's
  * experimental setup ("all graphs are processed into undirected", p = q
  * weights of 1).
  *
  * @param nV        number of vertices
  * @param offsets   length `nV + 1`; neighbors of `v` are
  *                  `neighbors[offsets(v) until offsets(v+1))`
  * @param neighbors flat, per-vertex-sorted adjacency
  */
final class CsrGraph(val nV: Int, val offsets: Array[Int], val neighbors: Array[Int]) {
  require(offsets.length == nV + 1, s"offsets length ${offsets.length} != nV+1 ${nV + 1}")
  require(offsets(0) == 0 && offsets(nV) == neighbors.length, "offsets must span neighbors")

  /** Number of directed adjacency entries (2x the undirected edge count). */
  def nEdgesDirected: Long = neighbors.length.toLong

  /** Undirected edge count (each edge stored in both endpoints' lists). */
  def nEdgesUndirected: Long = nEdgesDirected / 2

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  def avgDegree: Double = if (nV == 0) 0.0 else nEdgesDirected.toDouble / nV

  /** The i-th neighbor of `v` (0-based within its sorted list). */
  def neighbor(v: Int, i: Int): Int = neighbors(offsets(v) + i)

  /** Whether edge (u, z) exists — binary search in `u`'s sorted list. */
  def hasEdge(u: Int, z: Int): Boolean = {
    var lo = offsets(u); var hi = offsets(u + 1) - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      val m   = neighbors(mid)
      if (m == z) return true
      else if (m < z) lo = mid + 1
      else hi = mid - 1
    }
    false
  }

  /** Neighbors of `v` as a fresh array (test/analysis convenience). */
  def neighborsOf(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(neighbors, offsets(v), offsets(v + 1))

  /** Relabel vertices by permutation `newId(old) = perm(old)`, preserving the
    * edge set. Used to express an arbitrary partition as contiguous blocks.
    */
  def relabel(perm: Array[Int]): CsrGraph = {
    require(perm.length == nV, "permutation must cover all vertices")
    val deg = new Array[Int](nV)
    var v = 0
    while (v < nV) { deg(perm(v)) = degree(v); v += 1 }
    val off = new Array[Int](nV + 1)
    var i = 0
    while (i < nV) { off(i + 1) = off(i) + deg(i); i += 1 }
    val nbr = new Array[Int](neighbors.length)
    val cursor = java.util.Arrays.copyOf(off, nV)
    v = 0
    while (v < nV) {
      val nv = perm(v)
      var j = offsets(v)
      while (j < offsets(v + 1)) {
        nbr(cursor(nv)) = perm(neighbors(j))
        cursor(nv) += 1
        j += 1
      }
      v += 1
    }
    i = 0
    while (i < nV) {
      java.util.Arrays.sort(nbr, off(i), off(i + 1))
      i += 1
    }
    new CsrGraph(nV, off, nbr)
  }
}

object CsrGraph {

  /** Build a CSR graph from directed edge pairs; symmetrizes, deduplicates,
    * and drops self-loops, so the result is a simple undirected graph.
    */
  def fromEdges(nV: Int, srcs: Array[Int], dsts: Array[Int]): CsrGraph = {
    require(srcs.length == dsts.length, "src/dst arrays must align")
    // Symmetrize into a flat (u, v) multiset encoded as Longs for one sort.
    val m = srcs.length
    val enc = new Array[Long](2 * m)
    var i = 0
    var k = 0
    while (i < m) {
      val s = srcs(i); val d = dsts(i)
      require(s >= 0 && s < nV && d >= 0 && d < nV, s"edge ($s,$d) out of range [0,$nV)")
      if (s != d) {
        enc(k) = (s.toLong << 32) | (d.toLong & 0xffffffffL); k += 1
        enc(k) = (d.toLong << 32) | (s.toLong & 0xffffffffL); k += 1
      }
      i += 1
    }
    val used = java.util.Arrays.copyOf(enc, k)
    java.util.Arrays.sort(used)
    // Dedupe in place.
    var w = 0
    i = 0
    while (i < used.length) {
      if (w == 0 || used(i) != used(w - 1)) { used(w) = used(i); w += 1 }
      i += 1
    }
    val off = new Array[Int](nV + 1)
    i = 0
    while (i < w) { off(((used(i) >>> 32).toInt) + 1) += 1; i += 1 }
    i = 0
    while (i < nV) { off(i + 1) += off(i); i += 1 }
    val nbr = new Array[Int](w)
    i = 0
    while (i < w) { nbr(i) = used(i).toInt; i += 1 }
    new CsrGraph(nV, off, nbr)
  }

  /** Build from a Spark DataFrame with integer columns `src`, `dst`.
    * Graphs at lite scale fit the driver comfortably; the DataFrame is the
    * system of record (generators are Spark computations) and this is the
    * bridge into the disk-engine substrate.
    */
  def fromDataFrame(df: DataFrame, nV: Int): CsrGraph = {
    val rows = df.select("src", "dst").collect()
    val s = new Array[Int](rows.length)
    val d = new Array[Int](rows.length)
    var i = 0
    while (i < rows.length) {
      s(i) = rows(i).getInt(0); d(i) = rows(i).getInt(1); i += 1
    }
    fromEdges(nV, s, d)
  }
}
