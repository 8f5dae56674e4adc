package repro.engine

import repro.disk.DiskSim
import repro.graph.BlockedGraph
import repro.walk.WalkTask

/** A disk-based random-walk engine. Implementations:
  *
  *   - [[repro.core.BiBlockEngine]] — the paper's contribution (Alg. 1+2)
  *   - [[SogwEngine]] — SOGW / SGSC baselines (§7.1)
  *   - [[PlainBucketEngine]] — the PB engine of §7.3
  *   - [[FirstOrderEngine]] — GraphWalker-style first-order engine (§7.8)
  *
  * All engines charge I/O and execution to the supplied [[DiskSim]] and
  * advance walks through [[Stepping]] so trajectories are engine-invariant.
  */
trait WalkEngine {
  def name: String

  /** Run `task` to completion over `bg`.
    *
    * @param visits optional per-vertex visit accumulator (PRNV estimates)
    * @param trace  optional full-trajectory recorder (equivalence tests)
    */
  def run(bg: BlockedGraph, task: WalkTask, sim: DiskSim,
          visits: Array[Long] = null, trace: TraceCollector = null): DiskSim.Metrics
}
