package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Harness

/** T4 — ε sweep at fixed n: REQ space is Θ̃(1/ε) while the protected-half
  * baseline (its worst-case Θ(1/ε²) sizing) diverges quadratically; both
  * keep the error guarantee, across all arrival orders.
  */
class T4EpsSweepBench extends AnyFunSuite {

  private val n = 1 << 20
  private val epss = Seq(0.1, 0.05, 0.025, 0.0125)
  private lazy val rows = Harness.t4EpsSweep(n, epss, delta = 0.1, seed = 43)

  test("T4 table prints") {
    println(Harness.renderT4(rows, n))
    assert(rows.size == epss.size)
  }

  test("T4 shape: PH/REQ space ratio grows monotonically as eps shrinks") {
    val ratios = rows.map(_.spaceRatio)
    assert(ratios == ratios.sorted, s"ratios not increasing: $ratios")
  }

  test("T4 shape: halving eps roughly doubles the PH/REQ ratio (quadratic vs linear)") {
    val first = rows.head.spaceRatio
    val last = rows.last.spaceRatio
    // 3 halvings of eps -> predicted 8x ratio growth (modulo the sqrt-log
    // factor); require at least 3x to confirm the separation.
    assert(last / first >= 3.0, s"separation too weak: $first -> $last")
  }

  test("T4 shape: REQ keeps its error guarantee on the worst order") {
    rows.foreach(r => assert(r.reqWorstOrderErr <= r.eps,
      f"eps=${r.eps}: worst order err ${r.reqWorstOrderErr}%.4f"))
  }

  test("T4 shape: PH with worst-case sizing also keeps the guarantee") {
    rows.foreach(r => assert(r.phWorstOrderErr <= r.eps,
      f"eps=${r.eps}: PH worst order err ${r.phWorstOrderErr}%.4f"))
  }

  test("T4 shape: REQ space grows subquadratically in 1/eps") {
    val growth = rows.last.reqItems.toDouble / rows.head.reqItems
    // 1/eps grew 8x; quadratic would be 64x. Require well below.
    assert(growth < 24, s"REQ space grew $growth x over an 8x eps range")
  }
}
