package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Invariants of a single relative-compactor (Algorithm 1). */
class RelativeCompactorSpec extends AnyFunSuite {

  private def rng(seed: Long) = new java.util.Random(seed)

  private def fullCompactor(k: Int = 4, sections: Int = 4, seed: Long = 1):
      (RelativeCompactor, Array[Double]) = {
    val c = new RelativeCompactor(k, sections)
    val r = rng(seed)
    val xs = Array.fill(c.capacity)(r.nextDouble())
    xs.foreach(c.insert)
    (c, xs)
  }

  test("capacity is 2·k·numSections") {
    assert(new RelativeCompactor(4, 5).capacity == 40)
    assert(new RelativeCompactor(2, 2).capacity == 8)
    assert(new RelativeCompactor(16, 10).capacity == 320)
  }

  test("constructor rejects odd k") {
    intercept[IllegalArgumentException](new RelativeCompactor(3, 4))
  }

  test("constructor rejects k < 2") {
    intercept[IllegalArgumentException](new RelativeCompactor(0, 4))
  }

  test("constructor rejects < 2 sections") {
    intercept[IllegalArgumentException](new RelativeCompactor(4, 1))
  }

  test("insert grows size; isAtCapacity flips at B") {
    val c = new RelativeCompactor(2, 2)
    (1 to c.capacity - 1).foreach(i => c.insert(i.toDouble))
    assert(!c.isAtCapacity)
    c.insert(0.0)
    assert(c.isAtCapacity)
  }

  test("compact on a non-full buffer is rejected") {
    val c = new RelativeCompactor(2, 2)
    c.insert(1.0)
    intercept[IllegalArgumentException](c.compact(rng(1)))
  }

  test("first compaction involves exactly one section (L = k)") {
    val (c, _) = fullCompactor()
    val out = c.compact(rng(1))
    assert(out.length == c.k / 2)
    assert(c.size == c.capacity - c.k)
  }

  test("compaction leaves the B - L smallest items in place") {
    val (c, xs) = fullCompactor(k = 4, sections = 4)
    val sorted = xs.sorted
    c.compact(rng(1))
    assert(c.items.sorted.toSeq == sorted.take(c.capacity - c.k).toSeq)
  }

  test("the protected half (B/2 smallest) is never compacted (scheduled)") {
    val (c, _) = fullCompactor(k = 4, sections = 4, seed = 3)
    val protectedItems = c.items.sorted.take(c.capacity / 2)
    // run many compactions, refilling with LARGER items each time: the
    // original smallest half must survive every scheduled compaction.
    val r = rng(9)
    (1 to 50).foreach { _ =>
      c.compact(r)
      while (!c.isAtCapacity) c.insert(2.0 + r.nextDouble())
    }
    assert(c.items.sorted.take(c.capacity / 2).toSeq == protectedItems.toSeq)
  }

  test("promoted items are alternating elements of the compacted suffix") {
    val c = new RelativeCompactor(4, 4)
    val xs = (1 to c.capacity).map(_.toDouble)
    xs.foreach(c.insert)
    val out = c.compact(rng(5))
    val l = c.k
    val suffix = xs.takeRight(l)
    val odd = suffix.zipWithIndex.collect { case (x, i) if i % 2 == 1 => x }
    val even = suffix.zipWithIndex.collect { case (x, i) if i % 2 == 0 => x }
    assert(out.toSeq == odd || out.toSeq == even)
  }

  test("both coin outcomes occur across seeds") {
    // java.util.Random's first boolean is biased for small sequential seeds;
    // the sketches scramble their seeds (ReqSketch.scramble) — do the same.
    val outs = (1 to 32).map { s =>
      val c = new RelativeCompactor(2, 2)
      (1 to c.capacity).foreach(i => c.insert(i.toDouble))
      c.compact(rng(ReqSketch.scramble(s))).toSeq
    }.toSet
    assert(outs.size == 2)
  }

  test("compaction preserves weight for even-sized ranges (2·|out| removed)") {
    for (seed <- 1 to 20) {
      val (c, _) = fullCompactor(k = 6, sections = 3, seed = seed)
      val before = c.size
      val out = c.compact(rng(seed))
      assert(before - c.size == 2 * out.length)
    }
  }

  test("state increments on each compaction") {
    val (c, _) = fullCompactor()
    val r = rng(2)
    assert(c.state == 0)
    c.compact(r)
    assert(c.state == 1)
    while (!c.isAtCapacity) c.insert(r.nextDouble())
    c.compact(r)
    assert(c.state == 2)
  }

  test("schedule drives section counts 1,2,1,3,1,2,1,... (state trailing ones)") {
    val c = new RelativeCompactor(2, 8)
    val r = rng(4)
    val observed = (0 until 8).map { _ =>
      while (!c.isAtCapacity) c.insert(r.nextDouble())
      val before = c.size
      c.compact(r)
      (before - c.size) / c.k // = L/k, the number of sections involved
    }
    assert(observed == Seq(1, 2, 1, 3, 1, 2, 1, 4))
  }

  test("special compaction keeps exactly B/2 items") {
    val (c, xs) = fullCompactor(k = 4, sections = 4, seed = 7)
    val out = c.specialCompact(rng(7))
    assert(c.size == c.capacity / 2)
    assert(c.items.sorted.toSeq == xs.sorted.take(c.capacity / 2).toSeq)
    assert(out.nonEmpty)
  }

  test("special compaction is a no-op at or below B/2 items") {
    val c = new RelativeCompactor(4, 4)
    (1 to c.capacity / 2).foreach(i => c.insert(i.toDouble))
    val st = c.state
    assert(c.specialCompact(rng(1)).isEmpty)
    assert(c.size == c.capacity / 2 && c.state == st)
  }

  test("special compaction advances state when it compacts") {
    val (c, _) = fullCompactor()
    c.specialCompact(rng(1))
    assert(c.state == 1)
  }

  test("over-capacity items (merge transient) are always compacted") {
    val c = new RelativeCompactor(2, 2) // B = 8
    val xs = (1 to 20).map(_.toDouble)  // 2.5x over capacity
    xs.foreach(c.insert)
    c.compact(rng(1))
    // everything from sorted index B-L on is gone; size = B - L = 8 - 2 = 6
    assert(c.size == 6)
    assert(c.items.sorted.toSeq == xs.take(6))
  }

  test("countAtMost counts inclusively") {
    val c = new RelativeCompactor(2, 2)
    Seq(1.0, 2.0, 2.0, 3.0).foreach(c.insert)
    assert(c.countAtMost(0.5) == 0)
    assert(c.countAtMost(2.0) == 3)
    assert(c.countAtMost(9.0) == 4)
  }

  test("setParams grows capacity keeping items and state") {
    val (c, xs) = fullCompactor(k = 4, sections = 4)
    c.compact(rng(1))
    val (items, st) = (c.items.sorted, c.state)
    c.setParams(8, 6)
    assert(c.capacity == 96 && c.items.sorted == items && c.state == st)
  }

  test("absorbState ORs the states") {
    val c = new RelativeCompactor(2, 4)
    c.state = 0x5L
    c.absorbState(0x3L)
    assert(c.state == 0x7L)
  }

  for (k <- Seq(2, 4, 8, 16); sections <- Seq(2, 4, 8)) {
    test(s"repeated fill/compact keeps size within capacity (k=$k, s=$sections)") {
      val c = new RelativeCompactor(k, sections)
      val r = rng(k * 31 + sections)
      (1 to 2000).foreach { _ =>
        c.insert(r.nextDouble())
        if (c.isAtCapacity) c.compact(r)
        assert(c.size < c.capacity)
      }
    }
  }
}
