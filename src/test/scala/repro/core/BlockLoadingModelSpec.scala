package repro.core

import scala.collection.mutable.ArrayBuffer
import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.disk.{CostModel, DiskSim}
import repro.engine.Walk

class BlockLoadingModelSpec extends AnyFunSuite {
  private val g = TestGraphs.ring(40)
  private val bg = TestGraphs.blocked(g, 4)
  private def sim() = new DiskSim(CostModel.paperSsd)

  // ---- regression ------------------------------------------------------

  test("OLS with intercept recovers an exact line") {
    val xs = ArrayBuffer(0.0, 1.0, 2.0, 3.0)
    val ys = xs.map(x => 2.5 * x + 1.0)
    val f = Regression.fit(xs, ys, withIntercept = true)
    assert(math.abs(f.slope - 2.5) < 1e-12 && math.abs(f.intercept - 1.0) < 1e-12)
  }

  test("OLS without intercept recovers a proportional line") {
    val xs = ArrayBuffer(1.0, 2.0, 5.0)
    val ys = xs.map(_ * 4.0)
    val f = Regression.fit(xs, ys, withIntercept = false)
    assert(math.abs(f.slope - 4.0) < 1e-12 && f.intercept == 0.0)
  }

  test("OLS with intercept is least-squares on noisy data") {
    val rng = new scala.util.Random(5)
    val xs = ArrayBuffer.tabulate(200)(i => i / 200.0)
    val ys = xs.map(x => 3.0 * x + 0.5 + (rng.nextDouble() - 0.5) * 0.01)
    val f = Regression.fit(xs, ys, withIntercept = true)
    assert(math.abs(f.slope - 3.0) < 0.05 && math.abs(f.intercept - 0.5) < 0.01)
  }

  test("OLS rejects empty or misaligned input") {
    assertThrows[IllegalArgumentException](
      Regression.fit(ArrayBuffer.empty[Double], ArrayBuffer.empty[Double], withIntercept = true))
    assertThrows[IllegalArgumentException](
      Regression.fit(ArrayBuffer(1.0), ArrayBuffer(1.0, 2.0), withIntercept = false))
  }

  test("predict applies slope and intercept") {
    assert(Regression.Fit(2.0, 3.0).predict(4.0) == 11.0)
  }

  // ---- threshold (η₀ = b_f / (α_o − α_f), §5.2.2) ----------------------

  test("threshold matches the paper's formula") {
    val eta0 = LblTrainer.threshold(Regression.Fit(1.0, 0.3), Regression.Fit(2.5, 0.0))
    assert(math.abs(eta0 - 0.3 / 1.5) < 1e-12)
  }

  test("threshold is +inf when on-demand is never steeper") {
    assert(LblTrainer.threshold(Regression.Fit(3.0, 0.3), Regression.Fit(2.0, 0.0)).isPosInfinity)
  }

  test("threshold is 0 for a free full load") {
    assert(LblTrainer.threshold(Regression.Fit(1.0, 0.0), Regression.Fit(2.0, 0.0)) == 0.0)
  }

  // ---- policies --------------------------------------------------------

  test("Learned policy switches on η at the threshold") {
    val p = new BlockLoading.Learned(Array(0.5, 0.5))
    assert(p.mode(0, nWalks = 60, nVertices = 100) == BlockLoading.Full)     // η = 0.6
    assert(p.mode(1, nWalks = 40, nVertices = 100) == BlockLoading.OnDemand) // η = 0.4
  }

  test("AlwaysFull / AlwaysOnDemand are constant") {
    assert(BlockLoading.AlwaysFull.mode(0, 1, 100) == BlockLoading.Full)
    assert(BlockLoading.AlwaysOnDemand.mode(0, 99, 100) == BlockLoading.OnDemand)
  }

  // ---- loading + BlockAccess ------------------------------------------

  test("full load charges one block read, touch is free") {
    val s = sim()
    val a = BlockLoading.load(bg, 1, BlockLoading.Full, Seq.empty, s)
    assert(s.blockIOCount == 1 && s.vertexIOCount == 0)
    a.touch(12)
    assert(s.vertexIOCount == 0)
  }

  test("on-demand load charges one light I/O per distinct activated vertex") {
    val s = sim()
    val walks = Seq(
      Walk(0, 0, prev = 5, cur = 12, hop = 2),  // cur in block 1
      Walk(1, 0, prev = 13, cur = 25, hop = 2), // prev in block 1
      Walk(2, 0, prev = 12, cur = 30, hop = 2), // prev 12 again: deduplicated
    )
    BlockLoading.load(bg, 1, BlockLoading.OnDemand, walks, s)
    assert(s.blockIOCount == 0)
    assert(s.vertexIOCount == 2) // {12, 13}
  }

  test("on-demand touch charges a miss once, then is resident") {
    val s = sim()
    val a = BlockLoading.load(bg, 1, BlockLoading.OnDemand,
                              Seq(Walk(0, 0, prev = 5, cur = 12, hop = 2)), s)
    val before = s.vertexIOCount
    a.touch(14); a.touch(14)
    assert(s.vertexIOCount == before + 1)
    a.touch(12) // activated at load time: already resident
    assert(s.vertexIOCount == before + 1)
  }

  test("on-demand with no activated vertices charges nothing") {
    val s = sim()
    BlockLoading.load(bg, 2, BlockLoading.OnDemand,
                      Seq(Walk(0, 0, prev = 1, cur = 12, hop = 2)), s)
    assert(s.vertexIOCount == 0 && s.blockIOCount == 0)
  }

  // ---- trainer ---------------------------------------------------------

  test("trainer learns per-block thresholds from clean logs") {
    val full = new LoadLogCollector
    val od = new LoadLogCollector
    // Block 0: t_f = 0.1 + 1.0 η ; t_o = 3.0 η  => η₀ = 0.05
    for (eta <- Seq(0.01, 0.1, 0.5, 0.9)) {
      full.record(0, eta, 0.1 + 1.0 * eta)
      od.record(0, eta, 3.0 * eta)
    }
    val learned = LblTrainer.train(1, full, od)
    assert(math.abs(learned.thresholds(0) - 0.05) < 1e-9)
  }

  test("trainer falls back to the pooled fit for sparse blocks") {
    val full = new LoadLogCollector
    val od = new LoadLogCollector
    for (eta <- Seq(0.01, 0.2, 0.4, 0.8)) {
      full.record(0, eta, 0.2 + 1.0 * eta)
      od.record(0, eta, 5.0 * eta)
    }
    full.record(1, 0.3, 0.2 + 0.3) // single sample: below MinSamplesPerBlock
    val learned = LblTrainer.train(2, full, od)
    assert(math.abs(learned.thresholds(1) - learned.thresholds(0)) < 1e-9) // pooled ~= block-0 fit
    assert(math.abs(learned.thresholds(0) - 0.05) < 1e-9)
  }

  test("trainer with no samples yields threshold 0 (always on-demand is never chosen over full at η>0)") {
    val learned = LblTrainer.train(2, new LoadLogCollector, new LoadLogCollector)
    assert(learned.thresholds.forall(_ == 0.0))
  }
}
