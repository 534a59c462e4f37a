package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Harness

/** T1 — space vs n at fixed ε (Theorem 1: O(ε⁻¹·log^1.5(εn)·√log(1/δ))).
  *
  * Shape assertions: the REQ item count tracks the predicted
  * ε⁻¹·log₂(εn)^1.5 curve (ratio stays within a constant band), KLL stays
  * essentially flat in n (additive error needs no n-dependence), and the
  * protected-half baseline pays its Θ(ε⁻²) sizing.
  */
class T1SpaceVsNBench extends AnyFunSuite {

  private val eps = 0.04
  private lazy val rows = Harness.t1SpaceVsN(
    ns = Seq(1L << 14, 1L << 16, 1L << 18, 1L << 20),
    eps = eps, delta = 0.1, seed = 17)

  test("T1 table prints") {
    println(Harness.renderT1(rows, eps))
    assert(rows.size == 4)
  }

  test("T1 shape: REQ space tracks eps^-1 * log^1.5(eps n) within a 2.5x band") {
    val ratios = rows.map(_.reqOverPred)
    assert(ratios.max / ratios.min < 2.5,
      s"REQ/pred ratio not stable: $ratios")
  }

  test("T1 shape: REQ space grows with n, but sublinearly") {
    val items = rows.map(_.reqItems)
    assert(items == items.sorted, s"REQ items not increasing: $items")
    val growth = items.last.toDouble / items.head
    val nGrowth = (rows.last.n / rows.head.n).toDouble
    assert(growth < nGrowth / 4, s"space grew almost linearly: $growth vs n x$nGrowth")
  }

  test("T1 shape: KLL (additive) stays flat while REQ grows polylog") {
    val kllGrowth = rows.last.kllItems.toDouble / rows.head.kllItems
    assert(kllGrowth < 1.5, s"KLL space should be ~flat in n, grew $kllGrowth x")
  }

  test("T1 shape: protected-half space also grows sublinearly (levels ~ log n)") {
    // The PH-vs-REQ *separation* is asymptotic in 1/eps and is measured by
    // T4's sweep; at eps=0.04 the eq-(6) constants make the two comparable,
    // so T1 only records the PH column and checks its own growth shape.
    val items = rows.map(_.phItems)
    assert(items == items.sorted, s"PH items not increasing: $items")
    val growth = items.last.toDouble / items.head
    assert(growth < (rows.last.n / rows.head.n) / 4.0,
      s"PH space grew almost linearly: $growth x")
  }
}
