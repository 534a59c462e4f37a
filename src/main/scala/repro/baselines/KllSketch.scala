package repro.baselines

import scala.collection.mutable.ArrayBuffer

/** KLL sketch (Karnin–Lang–Liberty, FOCS 2016) — the optimal *additive*
  * error baseline the paper builds on and contrasts with.
  *
  * Levels hold plain buffers with geometrically decaying capacities
  * `cap(h) = max(kMin, ⌈k·c^(H−1−h)⌉)` for c = 2/3 (the paper's choice).
  * When total size exceeds total capacity, the lowest over-capacity level is
  * sorted and a uniformly random odd/even half is promoted — the same
  * compaction primitive as the REQ sketch but with no protected prefix and
  * no schedule, which is exactly why its error is additive (±O(n/k)) rather
  * than relative: low-ranked items are compacted as readily as any other.
  *
  * Mergeable: concatenate levels, then compress while over capacity.
  */
final class KllSketch(val k: Int, val seed: Long) extends Serializable {

  require(k >= 8, s"k must be >= 8, got $k")

  private val kMin = 8
  private val c = 2.0 / 3.0

  private val levels = ArrayBuffer(new ArrayBuffer[Double])
  private var count = 0L

  @transient private var _rng: java.util.Random = _
  private def rng: java.util.Random = {
    if (_rng == null)
      _rng = if (seed != 0) new java.util.Random(repro.core.ReqSketch.scramble(seed))
             else new java.util.Random()
    _rng
  }

  def n: Long = count

  def height: Int = levels.size - 1

  def itemsStored: Int = levels.iterator.map(_.size).sum

  private def capacity(h: Int): Int =
    math.max(kMin, math.ceil(k * math.pow(c, levels.size - 1 - h)).toInt)

  private def totalCapacity: Int = (0 until levels.size).map(capacity).sum

  def update(x: Double): Unit = {
    count += 1
    levels(0) += x
    if (itemsStored > totalCapacity) compress()
  }

  def updateAll(xs: IterableOnce[Double]): Unit = xs.iterator.foreach(update)

  def merge(other: KllSketch): KllSketch = {
    require(other.k == k, "can only merge KLL sketches with the same k")
    val (tgt, src) = if (this.levels.size >= other.levels.size) (this, other) else (other, this)
    tgt.count += src.count
    var h = 0
    while (h < src.levels.size) {
      tgt.levels(h) ++= src.levels(h)
      h += 1
    }
    while (tgt.itemsStored > tgt.totalCapacity) tgt.compress()
    tgt
  }

  /** Compact the lowest level at/over its capacity; if none, the lowest
    * non-trivial level (guards against pathological merge states).
    */
  private def compress(): Unit = {
    var h = (0 until levels.size).find(h => levels(h).size >= capacity(h)).getOrElse(
      (0 until levels.size).maxBy(levels(_).size))
    if (levels(h).size < 2) return
    val arr = levels(h).toArray
    java.util.Arrays.sort(arr)
    // On an odd count keep the minimum in place (cheap, unbiased for the
    // promoted half) and compact the even-sized remainder.
    val start = arr.length % 2
    val offset = start + (if (rng.nextBoolean()) 1 else 0)
    if (h + 1 == levels.size) levels += new ArrayBuffer[Double]
    var i = offset
    while (i < arr.length) { levels(h + 1) += arr(i); i += 2 }
    levels(h).clear()
    if (start == 1) levels(h) += arr(0)
  }

  /** Estimated rank R̂(y) = Σ_h 2^h · |{x ≤ y at level h}|. */
  def rank(y: Double): Long = {
    var r = 0L
    var h = 0
    while (h < levels.size) {
      val w = 1L << h
      val b = levels(h)
      var i = 0
      while (i < b.size) { if (b(i) <= y) r += w; i += 1 }
      h += 1
    }
    r
  }

  def quantile(phi: Double): Double = {
    require(phi > 0 && phi <= 1)
    if (count == 0) return Double.NaN
    val target = math.max(1L, math.ceil(phi * count).toLong)
    val cs = {
      val out = new ArrayBuffer[(Double, Long)](itemsStored)
      var h = 0
      while (h < levels.size) {
        val w = 1L << h
        levels(h).foreach(x => out += ((x, w)))
        h += 1
      }
      out.sortBy(_._1)
    }
    var acc = 0L
    var i = 0
    while (i < cs.length) {
      acc += cs(i)._2
      if (acc >= target) return cs(i)._1
      i += 1
    }
    cs.last._1
  }
}

object KllSketch {
  def apply(k: Int = 200, seed: Long = 0L): KllSketch = new KllSketch(k, seed)
}
