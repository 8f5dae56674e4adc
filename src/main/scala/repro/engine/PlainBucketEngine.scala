package repro.engine

import scala.collection.mutable.ArrayBuffer
import repro.disk.DiskSim
import repro.graph.BlockedGraph
import repro.walk.WalkTask

/** The plain bucket engine (PB, §7.3) — the ablation of the bi-block engine
  * without the triangular schedule, the skewed storage, and the
  * bucket-extending rule:
  *
  *   - walks are associated with their *current* block (traditional storage);
  *   - the current block is chosen by GraphWalker's state-aware strategy;
  *   - current walks are split into buckets by their *previous* block;
  *   - ancillary blocks are scheduled 0 .. N_B-1 (the jump back to b₀ after
  *     loading the current block is the random block I/O that §7.3 contrasts
  *     with the triangular schedule's sequential loads);
  *   - walks advance while inside either in-memory block, then are written
  *     back to their new current block's pool.
  */
final class PlainBucketEngine extends WalkEngine {
  def name: String = "PB"

  def run(bg: BlockedGraph, task: WalkTask, sim: DiskSim,
          visits: Array[Long] = null, trace: TraceCollector = null): DiskSim.Metrics = {
    val g = bg.g
    val nB = bg.nBlocks
    val pools = new WalkPools(nB)

    Init.run(bg, task, sim, visits, trace)(w => pools.add(bg.blockOf(w.cur), w))

    val scheduler = new Scheduling.GraphWalkerMix()
    var slot = 0L
    var choice = scheduler.choose(pools.sizes, pools.minHops, slot)
    while (choice >= 0) {
      val b = choice
      val walks = pools.drain(b)
      sim.walkIO(walks.length)

      // Buckets by previous block: after initialization every walk has
      // hop >= 1 and its previous vertex lies outside its current block.
      val buckets = Array.fill(nB)(new ArrayBuffer[Walk])
      walks.foreach(w => buckets(bg.blockOf(w.prev)) += w)

      sim.readBlock(bg.blockOffset(b), bg.blockBytes(b))
      sim.timeSlots += 1
      var i = 0
      while (i < nB) {
        if (i != b && buckets(i).nonEmpty) {
          sim.readBlock(bg.blockOffset(i), bg.blockBytes(i))
          buckets(i).foreach { w0 =>
            var w = w0
            var alive = true
            var inMem = true
            while (alive && inMem) {
              val z = Stepping.sample(g, task, w, sim)
              if (z < 0) alive = false
              else {
                w = Walk(w.id, w.src, w.cur, z, w.hop + 1)
                if (visits != null) visits(z) += 1
                if (trace != null) trace.step(w.id, z)
                if (task.stopsAfter(w.id, w.hop)) alive = false
                else {
                  val nb = bg.blockOf(w.cur)
                  inMem = nb == b || nb == i
                }
              }
            }
            if (alive) { pools.add(bg.blockOf(w.cur), w); sim.walkIO(1) }
          }
        }
        i += 1
      }
      slot += 1
      choice = scheduler.choose(pools.sizes, pools.minHops, slot)
    }
    sim.snapshot
  }
}
