package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Practical, ReqSketch}
import repro.exp.{Harness, Workloads}

/** The "simple approach" baseline: correct relative error when sized by its
  * quadratic worst-case rule, but at a quadratically larger space cost than
  * the REQ sketch — the separation claimed in Section 1.
  */
class ProtectedHalfSpec extends AnyFunSuite {

  test("constructor rejects odd or tiny capacity") {
    intercept[IllegalArgumentException](ProtectedHalfSketch(7))
    intercept[IllegalArgumentException](ProtectedHalfSketch(2))
  }

  test("capacityFor is even and ~2/eps^2") {
    assert(ProtectedHalfSketch.capacityFor(0.1) == 200)
    assert(ProtectedHalfSketch.capacityFor(0.05) == 800)
    val c = ProtectedHalfSketch.capacityFor(0.033)
    assert(c % 2 == 0 && c >= 2 / (0.033 * 0.033))
  }

  test("small streams are exact") {
    val s = ProtectedHalfSketch(64, seed = 1)
    val xs = Workloads.uniform(50, 2)
    s.updateAll(xs)
    xs.sorted.zipWithIndex.foreach { case (x, i) => assert(s.rank(x) == i + 1) }
  }

  test("total weight equals n in pure streaming (even compactions)") {
    val s = ProtectedHalfSketch(128, seed = 3)
    s.updateAll(Workloads.uniform(100000, 4))
    assert(s.rank(Double.MaxValue) == 100000)
  }

  for (order <- Workloads.orders) {
    test(s"relative error <= eps with worst-case sizing (order=$order)") {
      val eps = 0.1
      val data = Workloads.ordered(Workloads.uniform(80000, 5), order)
      val s = ProtectedHalfSketch.forEps(eps, seed = 6)
      s.updateAll(data)
      val p = Harness.errProfile(s.rank(_), data)
      assert(p.maxRel <= eps, f"order=$order maxRel=${p.maxRel}%.4f")
    }
  }

  test("merge combines counts") {
    val data = Workloads.uniform(60000, 7)
    val (l, r) = data.splitAt(30000)
    val a = ProtectedHalfSketch(256, seed = 8); a.updateAll(l)
    val b = ProtectedHalfSketch(256, seed = 9); b.updateAll(r)
    val m = a.merge(b)
    assert(m.n == 60000)
    assert(Harness.errProfile(m.rank(_), data).maxRel <= 0.2)
  }

  test("merge rejects mismatched capacity") {
    intercept[IllegalArgumentException](
      ProtectedHalfSketch(64).merge(ProtectedHalfSketch(128)))
  }

  test("protected half keeps the lowest ranks exact on sorted input") {
    val s = ProtectedHalfSketch(200, seed = 10)
    val data = (1 to 50000).map(_.toDouble).toArray
    s.updateAll(data)
    (1 to 100).foreach(r => assert(s.rank(r.toDouble) == r))
  }

  test("space separation: PH/REQ space ratio grows as eps shrinks") {
    // The claimed separation is asymptotic in 1/eps (Θ(ε⁻²) vs Θ̃(ε⁻¹)):
    // at moderate n the observable is the *ratio trend*, which T4 measures
    // at full scale — here we check it at mini scale.
    val n = 150000
    val data = Workloads.uniform(n, 11)
    def ratio(eps: Double): Double = {
      val ph = ProtectedHalfSketch.forEps(eps, seed = 12)
      ph.updateAll(data)
      val req = ReqSketch(eps, 0.1, Practical, seed = 13)
      req.updateAll(data)
      ph.itemsStored.toDouble / req.itemsStored
    }
    val (coarse, fine) = (ratio(0.1), ratio(0.02))
    assert(fine > coarse, s"ratio at eps=0.02 ($fine) not above eps=0.1 ($coarse)")
  }
}
