package repro.engine

import repro.core.{BlockLoading, LoadLogCollector}
import repro.disk.DiskSim
import repro.graph.BlockedGraph
import repro.walk.WalkTask

/** GraphWalker-style first-order engine (§7.8, Appendix A).
  *
  * One block is resident at a time; walks advance asynchronously while their
  * current vertex stays inside it and are re-associated with the block they
  * move into. The current-block scheduling strategy is pluggable (the five
  * strategies of Appendix A), and current-block loads optionally go through
  * the learning-based loading model — that is the "GraSorw" first-order
  * configuration of Table 7, versus "GraSorw-No-LBL" (iteration scheduling,
  * pure full load) and "GraphWalker" (state-aware scheduling, full load).
  */
final class FirstOrderEngine(
    scheduling: Scheduling,
    policy: BlockLoading.Policy = BlockLoading.AlwaysFull,
    loadLog: LoadLogCollector = null,
    engineName: String = null,
) extends WalkEngine {

  def name: String =
    if (engineName != null) engineName else s"FirstOrder(${scheduling.strategyName})"

  def run(bg: BlockedGraph, task: WalkTask, sim: DiskSim,
          visits: Array[Long] = null, trace: TraceCollector = null): DiskSim.Metrics = {
    require(!task.model.isSecondOrder,
      "FirstOrderEngine only supports first-order models; use the bi-block engine")
    val g = bg.g
    val pools = new WalkPools(bg.nBlocks)

    // First-order walks need no initialization pass: they start when their
    // source block first becomes the current block (GraphWalker behavior).
    var nextId = 0L
    task.starts.foreach { case (v, count) =>
      var k = 0
      while (k < count) {
        val w = Walk(nextId, v, -1, v, 0)
        nextId += 1
        if (visits != null) visits(v) += 1
        if (trace != null) trace.start(w.id, v)
        pools.add(bg.blockOf(v), w)
        k += 1
      }
    }

    var slot = 0L
    var choice = scheduling.choose(pools.sizes, pools.minHops, slot)
    while (choice >= 0) {
      val b = choice
      val walks = pools.drain(b)
      if (walks.nonEmpty || scheduling.loadsEmpty) {
        val t0  = sim.wallTimeSec
        val eta = walks.length.toDouble / math.max(1, bg.verticesInBlock(b))
        val mode = policy.mode(b, walks.length, bg.verticesInBlock(b))
        val access = BlockLoading.load(bg, b, mode, walks, sim)
        sim.timeSlots += 1
        sim.walkIO(walks.length)
        walks.foreach { w0 =>
          var w = w0
          var alive = true
          while (alive && bg.blockOf(w.cur) == b) {
            access.touch(w.cur)
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
        if (loadLog != null) loadLog.record(b, eta, sim.wallTimeSec - t0)
      }
      slot += 1
      choice = scheduling.choose(pools.sizes, pools.minHops, slot)
    }
    sim.snapshot
  }
}
