package repro.jobs

import repro.core._
import repro.exp.{Harness, Workloads}

/** Scratch smoke check (not a table job): exercises streaming, growth,
  * merge and the error profile on a small stream.
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val n = 200000
    val data = Workloads.uniform(n, 7)
    for (eps <- Seq(0.1, 0.05); profile <- Seq[ParamProfile](Practical, Theory)) {
      val s = ReqSketch(eps, 0.1, profile, seed = 11)
      s.updateAll(data)
      val p = Harness.errProfile(s.rank, data)
      println(f"eps=$eps profile=$profile n=${s.n} items=${s.itemsStored} " +
        f"levels=${s.height + 1} B=${s.bufferCapacity} k=${s.sectionSize} " +
        f"weight=${s.totalWeight} maxRel=${p.maxRel}%.4f mean=${p.meanRel}%.4f")
    }
    // merge path
    val chunks = data.grouped(n / 16).zipWithIndex.map { case (c, i) =>
      val s = ReqSketch(0.05, 0.1, Practical, seed = 100 + i)
      s.updateAll(c); s
    }.toSeq
    val merged = chunks.reduce((a, b) => a.merge(b))
    val pm = Harness.errProfile(merged.rank, data)
    println(f"merged n=${merged.n} items=${merged.itemsStored} weight=${merged.totalWeight} " +
      f"maxRel=${pm.maxRel}%.4f mean=${pm.meanRel}%.4f")
    // orders
    for (ord <- Workloads.orders) {
      val d = Workloads.ordered(data, ord)
      val s = ReqSketch(0.05, 0.1, Practical, seed = 13)
      s.updateAll(d)
      val p = Harness.errProfile(s.rank, d)
      println(f"order=$ord maxRel=${p.maxRel}%.4f items=${s.itemsStored}")
    }
  }
}
