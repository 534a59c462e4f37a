package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Harness, Workloads}

/** Streaming behaviour of the full REQ sketch (Algorithm 2 + Section 5). */
class ReqSketchSpec extends AnyFunSuite {

  test("empty sketch: n=0, rank 0 everywhere, quantile NaN") {
    val s = ReqSketch(0.1, 0.1, seed = 1)
    assert(s.n == 0 && s.itemsStored == 0)
    assert(s.rank(123.0) == 0)
    assert(s.quantile(0.5).isNaN)
  }

  test("constructor validates eps and delta") {
    intercept[IllegalArgumentException](ReqSketch(eps = 0.0))
    intercept[IllegalArgumentException](ReqSketch(eps = 1.5))
    intercept[IllegalArgumentException](ReqSketch(delta = 0.0))
    intercept[IllegalArgumentException](ReqSketch(delta = 0.9))
  }

  test("small streams are stored exactly (no compaction below B)") {
    val s = ReqSketch(0.1, 0.1, seed = 2)
    val xs = Workloads.uniform(100, 5)
    s.updateAll(xs)
    assert(s.height == 0 && s.itemsStored == 100)
    val sorted = xs.sorted
    sorted.zipWithIndex.foreach { case (x, i) => assert(s.rank(x) == i + 1) }
  }

  for (n <- Seq(1, 2, 10, 63)) {
    test(s"exact ranks for every element at n=$n") {
      val s = ReqSketch(0.2, 0.2, seed = n)
      val xs = Workloads.uniform(n, n)
      s.updateAll(xs)
      val sorted = xs.sorted
      sorted.zipWithIndex.foreach { case (x, i) => assert(s.rank(x) == i + 1) }
    }
  }

  test("rank is monotone non-decreasing in the query") {
    val s = ReqSketch(0.05, 0.1, seed = 3)
    s.updateAll(Workloads.uniform(50000, 7))
    val qs = (0 to 100).map(_ / 100.0)
    val rs = qs.map(s.rank)
    assert(rs == rs.sorted)
  }

  test("rank of +inf equals totalWeight; rank below min is 0") {
    val s = ReqSketch(0.05, 0.1, seed = 4)
    s.updateAll(Workloads.uniform(30000, 9))
    assert(s.rank(Double.MaxValue) == s.totalWeight)
    assert(s.rank(-1.0) == 0)
  }

  test("totalWeight equals n before the first bound growth") {
    val s = ReqSketch(0.05, 0.1, seed = 5)
    val n0 = s.nBound
    (1 to n0.toInt).foreach(i => s.update(i.toDouble))
    assert(s.totalWeight == s.n)
  }

  test("totalWeight stays within 2% of n across growths (unbiased drift)") {
    for (seed <- 1 to 5) {
      val s = ReqSketch(0.05, 0.1, seed = seed)
      s.updateAll(Workloads.uniform(300000, seed))
      assert(math.abs(s.totalWeight - s.n) <= 0.02 * s.n,
        s"weight=${s.totalWeight} n=${s.n} (seed=$seed)")
    }
  }

  test("nBound squares when exceeded and never lags n") {
    val s = ReqSketch(0.1, 0.1, seed = 6)
    val n0 = s.nBound
    s.updateAll(Workloads.uniform((n0 + 10).toInt, 3))
    assert(s.nBound >= n0.toLong * n0 && s.nBound >= s.n)
  }

  test("parameters are recomputed on growth (k shrinks, B grows)") {
    val s = ReqSketch(0.05, 0.1, seed = 7)
    val (k0, b0) = (s.sectionSize, s.bufferCapacity)
    s.updateAll(Workloads.uniform(200000, 11))
    assert(s.sectionSize <= k0)
    assert(s.bufferCapacity >= b0)
  }

  test("height is bounded by log2(n/B) + 1 (Observation 12)") {
    val s = ReqSketch(0.05, 0.1, seed = 8)
    val n = 500000
    s.updateAll(Workloads.uniform(n, 13))
    val bound = math.ceil(math.log(n.toDouble / s.bufferCapacity) / math.log(2)).toInt + 1
    assert(s.height <= math.max(1, bound))
  }

  test("per-level sizes never exceed the buffer capacity after updates") {
    val s = ReqSketch(0.1, 0.1, seed = 9)
    s.updateAll(Workloads.uniform(100000, 15))
    s.levelSizes.foreach(sz => assert(sz <= s.bufferCapacity))
  }

  // Accuracy sweep: all orders × eps × distributions, fixed seeds. The
  // per-query guarantee is eps w.p. 1-delta; with a fixed seed we allow a
  // 1.5x cushion on the max over the whole rank grid.
  for {
    eps <- Seq(0.1, 0.05)
    order <- Workloads.orders
  } {
    test(s"relative error <= 1.5*eps on 100k uniform, order=$order, eps=$eps") {
      val data = Workloads.ordered(Workloads.uniform(100000, 21), order)
      val s = ReqSketch(eps, 0.1, Practical, seed = 31)
      s.updateAll(data)
      val p = Harness.errProfile(s.rank, data)
      assert(p.maxRel <= 1.5 * eps, f"maxRel=${p.maxRel}%.4f")
    }
  }

  for (profile <- Seq[ParamProfile](Theory, Practical, FixedK(32))) {
    test(s"relative error <= 1.5*eps with profile $profile on 80k items") {
      val eps = 0.1
      val data = Workloads.uniform(80000, 23)
      val s = ReqSketch(eps, 0.1, profile, seed = 33)
      s.updateAll(data)
      val p = Harness.errProfile(s.rank, data)
      assert(p.maxRel <= 1.5 * eps, f"profile=$profile maxRel=${p.maxRel}%.4f")
    }
  }

  test("duplicate-heavy input (zipf-like) keeps relative error") {
    val rng = new java.util.Random(41)
    val data = Array.fill(100000)(math.floor(1.0 / (rng.nextDouble() + 1e-4)))
    val s = ReqSketch(0.05, 0.1, seed = 43)
    s.updateAll(data)
    val p = Harness.errProfile(s.rank, data)
    assert(p.maxRel <= 0.075, f"maxRel=${p.maxRel}%.4f")
  }

  test("constant stream collapses to exact ranks") {
    val s = ReqSketch(0.1, 0.1, seed = 45)
    s.updateAll(Array.fill(50000)(42.0))
    assert(s.rank(41.9) == 0)
    assert(math.abs(s.rank(42.0) - 50000L) <= 0.02 * 50000)
  }

  test("quantile is consistent with rank (phi*n within relative error)") {
    val data = Workloads.uniform(100000, 47)
    val s = ReqSketch(0.05, 0.1, seed = 49)
    s.updateAll(data)
    val sorted = data.sorted
    for (phi <- Seq(0.01, 0.1, 0.5, 0.9, 0.99)) {
      val q = s.quantile(phi)
      val trueRank = ExactRank.ranksLocal(sorted.clone(), Array(q)).head
      val target = math.ceil(phi * data.length)
      assert(math.abs(trueRank - target) <= 0.1 * target + s.bufferCapacity / 2.0,
        s"phi=$phi trueRank=$trueRank target=$target")
    }
  }

  test("quantile rejects out-of-range phi") {
    val s = ReqSketch(0.1, 0.1, seed = 51)
    s.update(1.0)
    intercept[IllegalArgumentException](s.quantile(0.0))
    intercept[IllegalArgumentException](s.quantile(1.5))
  }

  test("coreset weights are powers of two summing to totalWeight") {
    val s = ReqSketch(0.1, 0.1, seed = 53)
    s.updateAll(Workloads.uniform(50000, 55))
    val cs = s.coreset
    assert(cs.map(_._2).sum == s.totalWeight)
    assert(cs.forall { case (_, w) => (w & (w - 1)) == 0 })
    assert(cs.map(_._1).toSeq == cs.map(_._1).sorted.toSeq)
  }

  test("space is sublinear: items << n at n=500k") {
    val s = ReqSketch(0.05, 0.1, seed = 57)
    s.updateAll(Workloads.uniform(500000, 59))
    assert(s.itemsStored < 500000 / 10, s"items=${s.itemsStored}")
  }

  test("deterministic given a fixed seed") {
    def build() = {
      val s = ReqSketch(0.05, 0.1, seed = 61)
      s.updateAll(Workloads.uniform(100000, 63)); s
    }
    val (a, b) = (build(), build())
    assert(a.itemsStored == b.itemsStored)
    assert(a.coreset.toSeq == b.coreset.toSeq)
  }

  test("different seeds give different internal states (coin flips differ)") {
    def build(seed: Long) = {
      val s = ReqSketch(0.05, 0.1, seed = seed)
      s.updateAll(Workloads.uniform(100000, 63)); s
    }
    assert(build(1).coreset.toSeq != build(2).coreset.toSeq)
  }

  test("ranks (batch) agrees with rank (single)") {
    val s = ReqSketch(0.1, 0.1, seed = 65)
    s.updateAll(Workloads.uniform(20000, 67))
    val qs = Array(0.1, 0.5, 0.9)
    assert(s.ranks(qs).toSeq == qs.map(s.rank).toSeq)
  }
}
