package repro.walk

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

class TransitionModelSpec extends AnyFunSuite {

  private val square = TestGraphs.fromPairs(4, Seq((0, 1), (1, 2), (2, 3), (3, 0)))
  // A house graph: triangle 0-1-2 plus pendant edges for hop-distance variety.
  private val house = TestGraphs.fromPairs(5, Seq((0, 1), (1, 2), (2, 0), (2, 3), (3, 4)))

  test("DeepWalk samples only neighbors") {
    for (i <- 0 until 200) {
      val u = i / 200.0
      val z = DeepWalkModel.sampleNext(square, -1, 0, u)
      assert(square.hasEdge(0, z))
    }
  }

  test("DeepWalk probability is uniform over neighbors") {
    // Neighbors of 2 in the house graph: {0, 1, 3}.
    assert(DeepWalkModel.probability(house, -1, 2, 0) == 1.0 / 3)
    assert(DeepWalkModel.probability(house, -1, 2, 3) == 1.0 / 3)
    assert(DeepWalkModel.probability(house, -1, 2, 2) == 0.0)
  }

  test("DeepWalk on a dangling vertex returns -1") {
    val g = TestGraphs.fromPairs(3, Seq((0, 1)))
    assert(DeepWalkModel.sampleNext(g, -1, 2, 0.5) == -1)
  }

  test("Node2vec p=q=1 degenerates to uniform (probabilities)") {
    val m = Node2vecModel(1, 1)
    for (z <- Seq(0, 1, 3)) // neighbors of 2 in house: 0,1,3
      assert(math.abs(m.probability(house, 0, 2, z) - 1.0 / 3) < 1e-12)
  }

  test("Node2vec weight cases: return (h=0), common neighbor (h=1), far (h=2)") {
    val m = Node2vecModel(p = 2.0, q = 4.0)
    // Walk 0 -> 2 in house. Neighbors of 2: {0, 1, 3}.
    //   z=0: return, w=1/p=0.5 ; z=1: neighbor of 0, w=1 ; z=3: far, w=1/q=0.25.
    val Z = 0.5 + 1.0 + 0.25
    assert(math.abs(m.probability(house, 0, 2, 0) - 0.5 / Z) < 1e-12)
    assert(math.abs(m.probability(house, 0, 2, 1) - 1.0 / Z) < 1e-12)
    assert(math.abs(m.probability(house, 0, 2, 3) - 0.25 / Z) < 1e-12)
  }

  test("Node2vec probabilities sum to 1 over neighbors") {
    val m = Node2vecModel(p = 0.25, q = 4.0)
    for (prev <- Seq(0, 1, 3)) {
      val s = square.neighborsOf((prev + 1) % 4).map(z => m.probability(square, prev, (prev + 1) % 4, z)).sum
      assert(math.abs(s - 1.0) < 1e-12)
    }
  }

  test("Node2vec probability of a non-neighbor is zero") {
    val m = Node2vecModel(1, 1)
    assert(m.probability(house, 0, 2, 4) == 0.0)
  }

  test("Node2vec first step (prev = -1) is uniform") {
    val m = Node2vecModel(p = 9.0, q = 0.1)
    for (z <- house.neighborsOf(2))
      assert(math.abs(m.probability(house, -1, 2, z) - 1.0 / 3) < 1e-12)
  }

  test("Node2vec sampler inverts its own distribution (fine grid)") {
    val m = Node2vecModel(p = 0.5, q = 2.0)
    val counts = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
    val n = 100000
    for (i <- 0 until n) {
      val z = m.sampleNext(house, 0, 2, (i + 0.5) / n)
      counts(z) += 1
    }
    for (z <- house.neighborsOf(2)) {
      val expected = m.probability(house, 0, 2, z)
      assert(math.abs(counts(z).toDouble / n - expected) < 2e-3,
        s"z=$z got ${counts(z).toDouble / n} expected $expected")
    }
  }

  test("Node2vec sampler with Rng draws matches probabilities empirically") {
    val m = Node2vecModel(p = 4.0, q = 0.25)
    val counts = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
    val n = 60000
    for (i <- 0 until n) counts(m.sampleNext(house, 1, 2, Rng.unit(3, i, 0, Rng.MoveStream))) += 1
    for (z <- house.neighborsOf(2)) {
      val expected = m.probability(house, 1, 2, z)
      assert(math.abs(counts(z).toDouble / n - expected) < 0.01)
    }
  }

  test("Node2vec dangling current vertex returns -1") {
    val g = TestGraphs.fromPairs(3, Seq((0, 1)))
    assert(Node2vecModel(1, 1).sampleNext(g, 0, 2, 0.3) == -1)
  }

  test("Node2vec rejects non-positive hyperparameters") {
    assertThrows[IllegalArgumentException](Node2vecModel(0, 1))
    assertThrows[IllegalArgumentException](Node2vecModel(1, -2))
  }

  test("extreme u values stay in range") {
    val m = Node2vecModel(1, 1)
    assert(house.hasEdge(2, m.sampleNext(house, 0, 2, 0.0)))
    assert(house.hasEdge(2, m.sampleNext(house, 0, 2, 0.999999999)))
    assert(house.hasEdge(2, DeepWalkModel.sampleNext(house, -1, 2, 0.999999999)))
  }

  test("clique transitions: return discouraged by large p") {
    val g = TestGraphs.clique(5)
    val m = Node2vecModel(p = 100.0, q = 1.0)
    // From 0 -> 1, every other vertex is a common neighbor (w=1); return w=0.01.
    assert(m.probability(g, 0, 1, 0) < 0.01)
    assert(math.abs(g.neighborsOf(1).map(m.probability(g, 0, 1, _)).sum - 1.0) < 1e-12)
  }
}
