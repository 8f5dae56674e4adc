package repro.engine

import org.scalatest.funsuite.AnyFunSuite

class SchedulingSpec extends AnyFunSuite {
  private def hops(n: Int): Array[Int] = Array.fill(n)(0)

  test("Alphabet cycles through all blocks including empty ones") {
    val s = new Scheduling.Alphabet
    val sizes = Array(1L, 0L, 2L)
    assert((0 until 6).map(i => s.choose(sizes, hops(3), i)) == Seq(0, 1, 2, 0, 1, 2))
  }

  test("Alphabet loads empty blocks") {
    assert(new Scheduling.Alphabet().loadsEmpty)
  }

  test("Alphabet stops when all pools are empty") {
    val s = new Scheduling.Alphabet
    assert(s.choose(Array(0L, 0L), hops(2), 0) == -1)
  }

  test("Iteration skips empty blocks") {
    val s = new Scheduling.Iteration
    val sizes = Array(1L, 0L, 2L)
    assert((0 until 4).map(i => s.choose(sizes, hops(3), i)) == Seq(0, 2, 0, 2))
  }

  test("Iteration does not load empty blocks") {
    assert(!new Scheduling.Iteration().loadsEmpty)
  }

  test("Iteration stops when all pools are empty") {
    val s = new Scheduling.Iteration
    assert(s.choose(Array(0L, 0L, 0L), hops(3), 0) == -1)
  }

  test("Iteration resumes its cycle position across calls") {
    val s = new Scheduling.Iteration
    val sizes = Array(3L, 3L, 3L)
    assert(s.choose(sizes, hops(3), 0) == 0)
    assert(s.choose(sizes, hops(3), 1) == 1)
    sizes(2) = 0
    assert(s.choose(sizes, hops(3), 2) == 0) // 2 skipped, wraps
  }

  test("Min-Height picks the pool with the smallest minimum hop") {
    val s = new Scheduling.MinHeight
    assert(s.choose(Array(2L, 1L, 5L), Array(10, 3, 7), 0) == 1)
  }

  test("Min-Height ignores empty pools") {
    val s = new Scheduling.MinHeight
    assert(s.choose(Array(0L, 1L), Array(0, 9), 0) == 1)
  }

  test("Max-Sum picks the largest pool") {
    val s = new Scheduling.MaxSum
    assert(s.choose(Array(2L, 9L, 5L), hops(3), 0) == 1)
  }

  test("Max-Sum returns -1 when everything is empty") {
    assert(new Scheduling.MaxSum().choose(Array(0L, 0L), hops(2), 0) == -1)
  }

  test("GraphWalker mix chooses Max-Sum about 80% of the time") {
    val s = new Scheduling.GraphWalkerMix(p = 0.8)
    val sizes = Array(10L, 1L)       // Max-Sum -> 0
    val mh = Array(5, 1)             // Min-Height -> 1
    val picks = (0L until 2000L).map(s.choose(sizes, mh, _))
    val frac0 = picks.count(_ == 0).toDouble / picks.size
    assert(math.abs(frac0 - 0.8) < 0.05, s"Max-Sum fraction $frac0")
  }

  test("GraphWalker mix is deterministic per slot") {
    val a = new Scheduling.GraphWalkerMix()
    val b = new Scheduling.GraphWalkerMix()
    val sizes = Array(10L, 1L); val mh = Array(5, 1)
    for (slot <- 0L until 100L)
      assert(a.choose(sizes, mh, slot) == b.choose(sizes, mh, slot))
  }

  test("byName resolves all five strategies") {
    for (n <- Seq("Alphabet", "Iteration", "Min-Height", "Max-Sum", "GraphWalker"))
      assert(Scheduling.byName(n).strategyName == n)
    assertThrows[IllegalArgumentException](Scheduling.byName("nope"))
  }
}
