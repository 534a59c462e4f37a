package repro.baselines

import scala.collection.mutable.ArrayBuffer

/** The "simple approach" the paper starts from and rejects (Section 1,
  * *Challenges and techniques*): each level is a buffer of fixed capacity B
  * whose smallest B/2 items are protected; when full, the top B/2 items are
  * always compacted (no schedule). This achieves relative error but needs
  * `B = Θ(1/ε²)` in the worst case — i.e. total space
  * `Θ(ε⁻²·log(ε²n))`, matching Zhang et al. [24] — because without the
  * derandomized schedule a compaction touching item y's boundary can remove
  * as little as one important item, so the number of error-contributing
  * compactions is only bounded by `R_h(y)` instead of `R_h(y)/k`.
  *
  * Used as the space baseline in tables T1/T4: sized by its own worst-case
  * rule `B(ε) = 2·⌈1/ε²⌉` (rounded even) it keeps the ε guarantee but pays
  * quadratically in 1/ε, which is the paper's claimed separation.
  */
final class ProtectedHalfSketch(val bufferCapacity: Int, val seed: Long)
    extends Serializable {

  require(bufferCapacity >= 4 && bufferCapacity % 2 == 0,
    s"capacity must be even >= 4, got $bufferCapacity")

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

  def update(x: Double): Unit = {
    count += 1
    levels(0) += x
    var h = 0
    while (h < levels.size && levels(h).size >= bufferCapacity) {
      compactLevel(h)
      h += 1
    }
  }

  def updateAll(xs: IterableOnce[Double]): Unit = xs.iterator.foreach(update)

  def merge(other: ProtectedHalfSketch): ProtectedHalfSketch = {
    require(other.bufferCapacity == bufferCapacity,
      "can only merge sketches with the same capacity")
    val (tgt, src) =
      if (this.levels.size >= other.levels.size) (this, other) else (other, this)
    tgt.count += src.count
    var h = 0
    while (h < src.levels.size) {
      tgt.levels(h) ++= src.levels(h)
      h += 1
    }
    h = 0
    while (h < tgt.levels.size) {
      while (tgt.levels(h).size >= tgt.bufferCapacity) tgt.compactLevel(h)
      h += 1
    }
    tgt
  }

  /** Sort the level; keep the B/2 smallest; promote a random odd/even half
    * of everything above them.
    */
  private def compactLevel(h: Int): Unit = {
    val arr = levels(h).toArray
    java.util.Arrays.sort(arr)
    val keep = bufferCapacity / 2
    val offset = keep + (if (rng.nextBoolean()) 1 else 0)
    if (h + 1 == levels.size) levels += new ArrayBuffer[Double]
    var i = offset
    while (i < arr.length) { levels(h + 1) += arr(i); i += 2 }
    levels(h).clear()
    var j = 0
    while (j < keep && j < arr.length) { levels(h) += arr(j); j += 1 }
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
}

object ProtectedHalfSketch {

  /** Worst-case sizing for target relative error ε: B = 2·⌈1/ε²⌉ (even). */
  def capacityFor(eps: Double): Int = {
    val b = 2 * math.ceil(1.0 / (eps * eps)).toInt
    if (b % 2 == 0) math.max(4, b) else math.max(4, b + 1)
  }

  def forEps(eps: Double, seed: Long = 0L): ProtectedHalfSketch =
    new ProtectedHalfSketch(capacityFor(eps), seed)

  def apply(capacity: Int, seed: Long = 0L): ProtectedHalfSketch =
    new ProtectedHalfSketch(capacity, seed)
}
