package repro.engine

import repro.disk.DiskSim
import repro.graph.BlockedGraph
import repro.walk.WalkTask

/** SOGW and SGSC baselines (§7.1).
  *
  * SOGW is the naive second-order port of GraphWalker: walks are stored with
  * their current block (traditional storage); the current block is chosen by
  * GraphWalker's state-aware strategy; a walk advances while it stays inside
  * the current block; whenever a step needs the previous vertex's adjacency
  * and that vertex is not resident, a random light vertex I/O is charged.
  * Two block slots are kept in memory (the block about to be loaded is free
  * if it is already resident), matching the paper's memory-equalized setup.
  *
  * SGSC adds a static vertex cache: before execution the top-degree vertices
  * (degree sum >= the largest block's edge count) are pinned in memory — the
  * cache fill is charged as a full sequential scan of the graph — and
  * previous-vertex lookups that hit the cache cost nothing.
  */
final class SogwEngine(staticCache: Boolean) extends WalkEngine {
  def name: String = if (staticCache) "SGSC" else "SOGW"

  def run(bg: BlockedGraph, task: WalkTask, sim: DiskSim,
          visits: Array[Long] = null, trace: TraceCollector = null): DiskSim.Metrics = {
    val g = bg.g
    val nB = bg.nBlocks
    val pools = new WalkPools(nB)
    val secondOrder = task.model.isSecondOrder

    // SGSC static cache: top-degree vertices until the degree sum reaches
    // the maximum block edge count (§7.1 baseline definition).
    val cached: java.util.BitSet =
      if (!staticCache) null
      else {
        val budget = (0 until nB).map(bg.edgesInBlock).max
        val byDeg = (0 until g.nV).sortBy(v => -g.degree(v))
        val bits = new java.util.BitSet(g.nV)
        var sum = 0L
        var i = 0
        while (i < byDeg.length && sum < budget) {
          bits.set(byDeg(i)); sum += g.degree(byDeg(i)); i += 1
        }
        sim.chargeCacheInit(bg.totalBytes)
        bits
      }

    Init.run(bg, task, sim, visits, trace)(w => pools.add(bg.blockOf(w.cur), w))

    val scheduler = new Scheduling.GraphWalkerMix()
    // Two-slot block memory: a load is free if the block is still resident.
    val resident = new java.util.ArrayDeque[Int](2)
    var slot = 0L
    var choice = scheduler.choose(pools.sizes, pools.minHops, slot)
    while (choice >= 0) {
      val b = choice
      if (!resident.contains(b)) {
        sim.readBlock(bg.blockOffset(b), bg.blockBytes(b))
        resident.addLast(b)
        if (resident.size > 2) resident.removeFirst()
      }
      sim.timeSlots += 1
      val walks = pools.drain(b)
      sim.walkIO(walks.length)
      walks.foreach { w0 =>
        var w = w0
        var alive = true
        while (alive && bg.blockOf(w.cur) == b) {
          if (secondOrder && w.prev >= 0) {
            val pb = bg.blockOf(w.prev)
            val inMem = pb == b || resident.contains(pb) ||
              (cached != null && cached.get(w.prev))
            if (!inMem) sim.readVertices(1)
          }
          val z = Stepping.sample(g, task, w, sim)
          if (z < 0) alive = false
          else {
            w = Walk(w.id, w.src, w.cur, z, w.hop + 1)
            if (visits != null) visits(z) += 1
            if (trace != null) trace.step(w.id, z)
            if (task.stopsAfter(w.id, w.hop)) alive = false
          }
        }
        if (alive) { pools.add(bg.blockOf(w.cur), w); sim.walkIO(1) }
      }
      slot += 1
      choice = scheduler.choose(pools.sizes, pools.minHops, slot)
    }
    sim.snapshot
  }
}
