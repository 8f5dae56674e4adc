package repro.core

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite

class WalkEncodingSpec extends AnyFunSuite {
  import WalkEncoding._

  test("round-trips a simple walk") {
    val (hi, lo) = encode(source = 7, prev = 11, curOffset = 3, preBlock = 1, curBlock = 2, hop = 5)
    assert(decode(hi, lo) == Decoded(7, 11, 3, 1, 2, 5))
  }

  test("round-trips zeros") {
    val (hi, lo) = encode(0, 0, 0, 0, 0, 0)
    assert(decode(hi, lo) == Decoded(0, 0, 0, 0, 0, 0))
  }

  test("round-trips maximum field values") {
    val (hi, lo) = encode(Int.MaxValue, Int.MaxValue, MaxOffset - 1, MaxBlocks - 1, MaxBlocks - 1, MaxHops - 1)
    assert(decode(hi, lo) ==
      Decoded(Int.MaxValue, Int.MaxValue, MaxOffset - 1, MaxBlocks - 1, MaxBlocks - 1, MaxHops - 1))
  }

  test("supports 1024 blocks") { assert(MaxBlocks == 1024) }
  test("supports 1024 hops") { assert(MaxHops == 1024) }

  test("rejects out-of-range hop") {
    assertThrows[IllegalArgumentException](encode(0, 0, 0, 0, 0, MaxHops))
  }

  test("rejects out-of-range blocks") {
    assertThrows[IllegalArgumentException](encode(0, 0, 0, MaxBlocks, 0, 0))
    assertThrows[IllegalArgumentException](encode(0, 0, 0, 0, MaxBlocks, 0))
  }

  test("rejects out-of-range offset") {
    assertThrows[IllegalArgumentException](encode(0, 0, MaxOffset, 0, 0, 0))
  }

  test("rejects negative fields") {
    assertThrows[IllegalArgumentException](encode(0, 0, -1, 0, 0, 0))
    assertThrows[IllegalArgumentException](encode(0, 0, 0, -1, 0, 0))
    assertThrows[IllegalArgumentException](encode(0, 0, 0, 0, 0, -1))
  }

  test("property: round-trips 1000 random walks") {
    val rng = new Random(12345)
    for (_ <- 1 to 1000) {
      val d = Decoded(rng.nextInt(Int.MaxValue), rng.nextInt(Int.MaxValue),
                      rng.nextInt(MaxOffset), rng.nextInt(MaxBlocks),
                      rng.nextInt(MaxBlocks), rng.nextInt(MaxHops))
      val (hi, lo) = encode(d.source, d.prev, d.curOffset, d.preBlock, d.curBlock, d.hop)
      assert(decode(hi, lo) == d)
    }
  }

  test("distinct states encode distinctly (pigeonhole sample)") {
    val rng = new Random(99)
    val seen = scala.collection.mutable.Set.empty[(Long, Long)]
    for (_ <- 1 to 500) {
      val enc = encode(rng.nextInt(1 << 20), rng.nextInt(1 << 20), rng.nextInt(MaxOffset),
                       rng.nextInt(MaxBlocks), rng.nextInt(MaxBlocks), rng.nextInt(MaxHops))
      seen += enc
    }
    assert(seen.size >= 499) // collisions would indicate overlapping bit fields
  }
}
