package repro.bench

import repro.disk.{CostModel, DiskSim}
import repro.graph.{BlockedGraph, GraphSpec}
import repro.walk.WalkTask

/** Scale bridging between the lite datasets and the paper's setup
  * (DESIGN.md "Scale bridging"): builds the DiskSim for a run with
  *
  *   byteScale σ_B = paper CSR bytes / lite CSR bytes
  *   walkScale σ_W = paper walk-steps / lite walk-steps
  *
  * so byte-proportional costs (block I/O) and per-step-proportional costs
  * (vertex I/O, walk I/O, execution) are charged at paper magnitude while
  * every scheduling/loading decision is computed on the lite graph.
  */
object Scale {

  /** Paper workload sizes (§7.1): RWNV = 10 walks/vertex x length 80;
    * PRNV = 4|V| total samples for the real graphs, 4|V| per query x 100
    * query nodes for the Table 5/6 synthetic family; DeepWalk = 10 x 80.
    */
  def paperSteps(spec: GraphSpec, task: WalkTask): Double = task.name match {
    case "RWNV" | "DeepWalk" => 10.0 * spec.paperV * 80
    case "PRNV"              => spec.paperPrnvWalks.toDouble * expectedPrnvLen(task)
    case other               => throw new IllegalArgumentException(s"unknown task $other")
  }

  private def expectedPrnvLen(task: WalkTask): Double = {
    // E[min(Geom(stop), maxLen)] — identical for paper and lite, so it
    // cancels in the ratio; kept explicit for readability.
    val p = task.stopProb
    if (p <= 0) task.maxLen.toDouble
    else (1 - math.pow(1 - p, task.maxLen.toDouble)) / p
  }

  def liteSteps(task: WalkTask): Double = task.name match {
    case "PRNV" => task.totalWalks.toDouble * expectedPrnvLen(task)
    case _      => task.totalWalks.toDouble * task.maxLen
  }

  def walkScale(spec: GraphSpec, task: WalkTask): Double =
    paperSteps(spec, task) / liteSteps(task)

  def byteScale(spec: GraphSpec, bg: BlockedGraph): Double =
    spec.paperCsrBytes.toDouble / bg.totalBytes

  /** A fresh simulator for one engine run. */
  def sim(spec: GraphSpec, bg: BlockedGraph, task: WalkTask): DiskSim =
    new DiskSim(CostModel.paperSsd, byteScale(spec, bg), walkScale(spec, task))
}
