package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** The derandomized compaction schedule: trailing-ones arithmetic, Fact 4
  * (between two compactions involving exactly j sections there is one
  * involving more), and the bitwise-OR state-merge facts (Facts 15/16).
  */
class ScheduleSpec extends AnyFunSuite {

  private val c = new RelativeCompactor(k = 2, numSections = 8)

  test("trailing ones of 0 is 0") { assert(c.trailingOnes(0L) == 0) }
  test("trailing ones of 1 is 1") { assert(c.trailingOnes(1L) == 1) }
  test("trailing ones of 2 (10b) is 0") { assert(c.trailingOnes(2L) == 0) }
  test("trailing ones of 3 (11b) is 2") { assert(c.trailingOnes(3L) == 2) }
  test("trailing ones of 0b0111 is 3") { assert(c.trailingOnes(7L) == 3) }
  test("trailing ones of 0b1011 is 2") { assert(c.trailingOnes(11L) == 2) }
  test("trailing ones of -1 (all ones) is 64") { assert(c.trailingOnes(-1L) == 64) }

  for (bits <- 1 to 10) {
    test(s"schedule: section $bits is involved every 2^$bits-th compaction") {
      // Over states C = 0 .. 2^12, L = (z(C)+1)k involves section j exactly
      // when z(C)+1 >= j, i.e. C ends in at least j-1 ones; that happens
      // with period 2^j (derandomized exponential distribution).
      val involved = (0 until (1 << 12)).count { s =>
        java.lang.Long.numberOfTrailingZeros(~s.toLong) + 1 >= bits
      }
      assert(involved == (1 << 12) / (1 << (bits - 1)))
    }
  }

  test("Fact 4: between two j-section compactions there is a larger one") {
    // simulate 2^14 consecutive states; record for each compaction the
    // number of sections involved and check the in-between property.
    val sections = (0 until (1 << 14)).map(s =>
      java.lang.Long.numberOfTrailingZeros(~s.toLong) + 1)
    for (j <- 1 to 10) {
      val idx = sections.zipWithIndex.filter(_._1 == j).map(_._2)
      idx.sliding(2).foreach {
        case Seq(a, b) =>
          assert((a + 1 until b).exists(sections(_) > j),
            s"no >$j-section compaction between states $a and $b")
        case _ =>
      }
    }
  }

  test("Fact 16: (C' OR C'') <= C' + C'' for random states") {
    val rng = new java.util.Random(1)
    (1 to 1000).foreach { _ =>
      val a = rng.nextLong() & 0xffffffffL
      val b = rng.nextLong() & 0xffffffffL
      assert((a | b) <= a + b)
    }
  }

  test("Fact 15: OR preserves set bits of both operands") {
    val rng = new java.util.Random(2)
    (1 to 1000).foreach { _ =>
      val a = rng.nextLong() & 0xffffffffL
      val b = rng.nextLong() & 0xffffffffL
      assert(((a | b) & a) == a && ((a | b) & b) == b)
    }
  }

  test("nextCompactionSections is clamped to numSections - 1") {
    val cc = new RelativeCompactor(k = 2, numSections = 4)
    cc.state = -1L // 64 trailing ones — adversarial
    assert(cc.nextCompactionSections == 3)
  }

  test("nextCompactionSections starts at 1") {
    val cc = new RelativeCompactor(k = 2, numSections = 4)
    assert(cc.nextCompactionSections == 1)
  }

  for (state <- Seq(0L, 1L, 2L, 3L, 7L, 8L, 15L)) {
    test(s"nextCompactionSections matches z(C)+1 for C=$state within bounds") {
      val cc = new RelativeCompactor(k = 2, numSections = 16)
      cc.state = state
      assert(cc.nextCompactionSections == cc.trailingOnes(state) + 1)
    }
  }
}
