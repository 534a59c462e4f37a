package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Harness

/** T2 — tail accuracy at comparable space (the paper's Section-1
  * motivation): REQ keeps relative error ≤ ε at every rank, while the
  * additive-error KLL blows up multiplicatively at the low tail.
  */
class T2TailAccuracyBench extends AnyFunSuite {

  private val n = 1 << 20
  private val eps = 0.04
  private lazy val res = Harness.t2TailAccuracy(n, eps, delta = 0.1, seed = 23)

  test("T2 table prints") {
    println(Harness.renderT2(res, n, eps))
    assert(res.rows.nonEmpty)
  }

  test("T2 shape: REQ relative error stays below eps at every rank") {
    assert(res.reqMaxRel <= eps,
      f"REQ max relative error ${res.reqMaxRel}%.4f exceeds eps=$eps")
  }

  test("T2 shape: KLL relative error at small ranks exceeds 10x REQ's") {
    assert(res.kllMaxRelSmallRanks > 10 * math.max(res.reqMaxRel, 1e-4),
      f"KLL small-rank err ${res.kllMaxRelSmallRanks}%.3f vs REQ ${res.reqMaxRel}%.4f")
  }

  test("T2 shape: KLL is fine at large ranks (additive guarantee intact)") {
    val large = res.rows.filter(_.rank >= n / 4)
    assert(large.nonEmpty && large.forall(_.kllRelErr <= 0.05),
      s"KLL large-rank errors: ${large.map(_.kllRelErr)}")
  }

  test("T2 setup: the sketches use comparable space (within 2x)") {
    val ratio = res.reqItems.toDouble / res.kllItems
    assert(ratio > 0.5 && ratio < 2.0,
      s"space mismatch: REQ=${res.reqItems} KLL=${res.kllItems}")
  }
}
