package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Harness

/** T6 — the probabilistic guarantee itself (Theorem 1):
  * Pr[|Err(y)| ≥ ε·R(y)] < δ, measured as the per-query failure rate over
  * independent seeds.
  */
class T6FailureProbBench extends AnyFunSuite {

  private val n = 1 << 16
  private val eps = 0.05
  private val trials = 400
  private lazy val rows = Harness.t6FailureProb(n, eps,
    deltas = Seq(0.05, 0.2), trials = trials, seed = 53)

  test("T6 table prints") {
    println(Harness.renderT6(rows, n))
    assert(rows.size == 2)
  }

  test("T6 shape: empirical failure rate stays below delta for every query") {
    rows.foreach { r =>
      assert(r.worstQueryFailRate <= r.delta,
        f"delta=${r.delta}: worst per-query failure rate ${r.worstQueryFailRate}%.4f")
    }
  }

  test("T6 shape: mean failure rate is far below delta (analysis is conservative)") {
    rows.foreach(r => assert(r.meanFailRate <= r.delta / 2,
      f"delta=${r.delta}: mean rate ${r.meanFailRate}%.4f"))
  }
}
