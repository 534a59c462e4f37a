package repro.bench

import repro.SparkSpec
import repro.exp.{Harness, Workloads}

/** T3 — full mergeability (Theorem 1 / Appendix C): building the sketch via
  * Spark treeReduce over partitions or via a random pairwise merge tree must
  * give the same accuracy and essentially the same space as a single-stream
  * build, on both a skewed synthetic column and a TPC-H-lite column.
  */
class T3MergeabilityBench extends SparkSpec {

  private val eps = 0.04

  private lazy val zipfData =
    Workloads.zipf(spark, rows = 1L << 20, nKeys = 100000, seed = 31)
  private lazy val zipfRows =
    Harness.t3Mergeability(spark, zipfData, eps, delta = 0.1, seed = 37)

  private lazy val liData = Workloads.lineitemPrices(spark, sf = 0.1)
  private lazy val liRows =
    Harness.t3Mergeability(spark, liData, eps, delta = 0.1, seed = 41)

  test("T3 tables print") {
    println(Harness.renderT3(zipfRows, zipfData.length, eps, "zipf keys"))
    println(Harness.renderT3(liRows, liData.length, eps, "lineitem l_extendedprice SF=0.1"))
    assert(zipfRows.size == 4 && liRows.size == 4)
  }

  test("T3 shape: every build variant keeps relative error <= eps (zipf)") {
    zipfRows.foreach(r =>
      assert(r.maxRel <= eps, f"${r.variant}: maxRel=${r.maxRel}%.4f"))
  }

  test("T3 shape: every build variant keeps relative error <= eps (lineitem)") {
    liRows.foreach(r =>
      assert(r.maxRel <= eps, f"${r.variant}: maxRel=${r.maxRel}%.4f"))
  }

  test("T3 shape: merged space within 2x of streaming space") {
    for (rows <- Seq(zipfRows, liRows)) {
      val streaming = rows.find(_.variant == "streaming").get.items
      rows.foreach(r => assert(r.items <= 2 * streaming,
        s"${r.variant}: ${r.items} vs streaming $streaming"))
    }
  }

  test("T3 shape: weight drift under merging stays below 2%") {
    (zipfRows ++ liRows).foreach(r =>
      assert(r.weightDrift <= 0.02, f"${r.variant}: drift=${r.weightDrift}%.4f"))
  }
}
