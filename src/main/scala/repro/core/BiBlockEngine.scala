package repro.core

import scala.collection.mutable.ArrayBuffer
import repro.disk.DiskSim
import repro.engine.{Init, Stepping, TraceCollector, Walk, WalkEngine}
import repro.graph.BlockedGraph
import repro.walk.WalkTask

/** The bi-block execution engine (§4, Algorithms 1 and 2).
  *
  * Current blocks are scheduled iteratively `0 .. N_B - 2`; within a time
  * slot, ancillary blocks are scheduled triangularly `b+1 .. N_B - 1`
  * (skipping empty buckets, like the iteration-based current schedule skips
  * empty pools). Walks live in the skewed storage (min-block pools), are
  * collected into buckets by Eq. 4, advance while their current vertex stays
  * inside either in-memory block, and are re-associated by the Alg. 2 case
  * analysis — including the bucket-extending rule of line 14.
  *
  * @param policy  ancillary-block loading policy (§5): pure full load,
  *                pure on-demand, or the learned threshold model
  * @param loadLog optional (block, η, t) sample collector for LBL training
  */
final class BiBlockEngine(
    policy: BlockLoading.Policy = BlockLoading.AlwaysFull,
    loadLog: LoadLogCollector = null,
) extends WalkEngine {

  def name: String = policy match {
    case BlockLoading.AlwaysFull     => "BiBlock(full)"
    case BlockLoading.AlwaysOnDemand => "BiBlock(on-demand)"
    case _: BlockLoading.Learned     => "GraSorw"
  }

  def run(bg: BlockedGraph, task: WalkTask, sim: DiskSim,
          visits: Array[Long] = null, trace: TraceCollector = null): DiskSim.Metrics = {
    val g = bg.g
    val nB = bg.nBlocks
    val storage = new SkewedWalkStorage(bg)

    Init.run(bg, task, sim, visits, trace)(storage.persist)

    while (!storage.isEmpty) {
      sim.supersteps += 1
      var b = 0
      while (b < math.max(1, nB - 1)) { // current block iterates 0 .. N_B-2
        if (storage.pools.size(b) > 0) {
          val curWalks = storage.pools.drain(b)
          sim.walkIO(curWalks.length) // load the associated walks (Alg. 1 l.3)

          // Collect buckets (Eq. 4): by the "other" block of the pair.
          val buckets = Array.fill(nB)(new ArrayBuffer[Walk])
          curWalks.foreach { w =>
            val p =
              if (bg.blockOf(w.prev) == b) bg.blockOf(w.cur)
              else bg.blockOf(w.prev)
            buckets(p) += w
          }

          // Load the current block (always full — it is shared by all
          // buckets of the slot) and run the triangular ancillary sweep.
          sim.readBlock(bg.blockOffset(b), bg.blockBytes(b))
          sim.timeSlots += 1
          var i = b + 1
          while (i < nB) {
            if (buckets(i).nonEmpty) {
              val t0  = sim.wallTimeSec
              val eta = buckets(i).length.toDouble / math.max(1, bg.verticesInBlock(i))
              val mode = policy.mode(i, buckets(i).length, bg.verticesInBlock(i))
              val access = BlockLoading.load(bg, i, mode, buckets(i), sim)

              var idx = 0
              while (idx < buckets(i).length) { // may grow via bucket-extending
                var w = buckets(i)(idx)
                idx += 1
                // UpdateWalk: advance while the walk stays in-memory.
                var alive = true
                var inMem = true
                while (alive && inMem) {
                  val cb = bg.blockOf(w.cur)
                  if (cb == i) access.touch(w.cur)
                  if (w.prev >= 0 && bg.blockOf(w.prev) == i) access.touch(w.prev)
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
                if (alive) {
                  // Walk persistence — Alg. 2 case analysis.
                  val cur = bg.blockOf(w.cur)
                  val pre = bg.blockOf(w.prev)
                  if (cur < b) { storage.persist(w); sim.walkIO(1) }
                  else if (cur < i) { // b < cur < i
                    if (pre == b) { storage.pools.add(b, w); sim.walkIO(1) }
                    else { storage.persist(w); sim.walkIO(1) }
                  } else { // cur > i
                    if (pre == b) buckets(cur) += w // bucket-extending (l.14)
                    else { storage.pools.add(i, w); sim.walkIO(1) }
                  }
                }
              }

              if (loadLog != null)
                loadLog.record(i, eta, sim.wallTimeSec - t0)
            }
            i += 1
          }
        }
        b += 1
      }
    }
    sim.snapshot
  }
}
