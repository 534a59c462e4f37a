package repro.exp

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import repro.SynthData

/** Input streams for the experiment tables.
  *
  * The sketch is comparison-based and its guarantees are order-oblivious,
  * so the experiments sweep both the value distribution (uniform, zipf,
  * TPC-H-lite columns) and the *arrival order* (random / sorted / reversed /
  * zoom-in), the latter being where naive relative-error sketches degrade.
  */
object Workloads {

  /** Deterministic local uniform stream (distinct values a.s.). */
  def uniform(n: Int, seed: Long): Array[Double] = {
    val rng = new java.util.Random(seed)
    Array.fill(n)(rng.nextDouble())
  }

  /** Orders: `random` (as generated), `sorted`, `reversed`, `zoomin`
    * (alternates the remaining minimum and maximum — every prefix brackets
    * the whole range, stressing the protected-prefix logic).
    */
  val orders: Seq[String] = Seq("random", "sorted", "reversed", "zoomin")

  def ordered(data: Array[Double], order: String): Array[Double] = order match {
    case "random"   => data
    case "sorted"   => { val a = data.clone(); java.util.Arrays.sort(a); a }
    case "reversed" => { val a = data.clone(); java.util.Arrays.sort(a); a.reverse }
    case "zoomin" =>
      val a = data.clone(); java.util.Arrays.sort(a)
      val out = new Array[Double](a.length)
      var lo = 0; var hi = a.length - 1; var i = 0
      while (lo <= hi) {
        out(i) = a(lo); i += 1; lo += 1
        if (lo <= hi) { out(i) = a(hi); i += 1; hi -= 1 }
      }
      out
    case other => throw new IllegalArgumentException(s"unknown order: $other")
  }

  /** Zipf-keyed values generated through Spark (SynthData), collected. */
  def zipf(spark: SparkSession, rows: Long, nKeys: Long, seed: Long): Array[Double] =
    SynthData.zipfKeys(spark, rows, nKeys, seed = seed)
      .select(col("k").cast("double")).collect().map(_.getDouble(0))

  /** TPC-H-lite lineitem extended prices at the given scale factor. */
  def lineitemPrices(spark: SparkSession, sf: Double): Array[Double] =
    SynthData.lineitem(spark, sf)
      .select(col("l_extendedprice").cast("double")).collect().map(_.getDouble(0))

  /** Geometric grid of query ranks {1, 2, 4, …} ∪ {n} — the small ranks are
    * exactly where relative error is strictly harder than additive.
    */
  def rankGrid(n: Long): Array[Long] = {
    val b = Array.newBuilder[Long]
    var r = 1L
    while (r < n) { b += r; r *= 2 }
    b += n
    b.result()
  }
}
