package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Harness

/** T5 — amortized update cost (Section 4: O(log B) amortized): ns/update
  * should stay near-flat as n grows 8x, and stay within an interactive
  * budget in absolute terms.
  */
class T5ThroughputBench extends AnyFunSuite {

  private lazy val rows = Harness.t5Throughput(
    ns = Seq(1L << 18, 1L << 19, 1L << 20, 1L << 21),
    epss = Seq(0.1, 0.025), delta = 0.1, seed = 47)

  test("T5 table prints") {
    println(Harness.renderT5(rows))
    assert(rows.size == 8)
  }

  test("T5 shape: update cost is near-flat in n (amortized, not per-item-linear)") {
    for (eps <- Seq(0.1, 0.025)) {
      val r = rows.filter(_.eps == eps).sortBy(_.n)
      val growth = r.last.nsPerUpdate / r.head.nsPerUpdate
      assert(growth < 4.0,
        f"eps=$eps: ns/update grew ${growth}%.2f x over an 8x n range")
    }
  }

  test("T5 shape: absolute cost stays below 5 microseconds per update") {
    rows.foreach(r => assert(r.nsPerUpdate < 5000,
      f"n=${r.n} eps=${r.eps}: ${r.nsPerUpdate}%.0f ns/update"))
  }
}
