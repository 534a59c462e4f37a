package repro.core

import scala.collection.mutable.ArrayBuffer

/** One level of the REQ sketch: the relative-compactor of Algorithm 1.
  *
  * The buffer has capacity `B = 2·k·numSections`. Its lowest-ranked half
  * (B/2 items) is never touched by a scheduled compaction; the upper half is
  * divided into `numSections` sections of `k` items, numbered from the
  * largest down. A scheduled compaction involves the top
  * `L = (z(C)+1)·k` items where `z(C)` is the number of trailing ones in the
  * binary representation of the schedule state `C` — the derandomized
  * exponential schedule that yields the paper's `R_h(y)/k` bound on
  * important steps (Lemma 5 / Fact 4). The leftmost section
  * (index `numSections`) is reserved for special compactions, which keep
  * only the `B/2` smallest items (Appendix C, eq. 15).
  *
  * Items above index `B` (possible transiently during merges) are always
  * included in a compaction (Algorithm 4). Both scheduled and special
  * compactions advance `C`; merge combines states with bitwise OR
  * (Fact 15/18).
  *
  * The buffer is kept unsorted; compactions sort. The coin that picks
  * odd/even survivors is supplied by the caller so the sketch owns a single
  * RNG stream.
  */
final class RelativeCompactor(
    var k: Int,
    var numSections: Int
) extends Serializable {

  require(k >= 2 && k % 2 == 0, s"section size must be even >= 2, got $k")
  require(numSections >= 2, s"need >= 2 sections, got $numSections")

  private val buf = new ArrayBuffer[Double]

  /** Compaction-schedule state C (Algorithm 1 line 3). */
  var state: Long = 0L

  /** Buffer capacity B = 2·k·numSections. */
  def capacity: Int = 2 * k * numSections

  def size: Int = buf.size

  def isAtCapacity: Boolean = buf.size >= capacity

  def insert(x: Double): Unit = buf += x

  def insertAll(xs: Iterable[Double]): Unit = buf ++= xs

  /** Immutable view of the stored items (unsorted). */
  def items: IndexedSeq[Double] = buf.toIndexedSeq

  /** Number of stored items ≤ y. */
  def countAtMost(y: Double): Int = {
    var c = 0
    var i = 0
    while (i < buf.length) { if (buf(i) <= y) c += 1; i += 1 }
    c
  }

  /** Number of trailing ones in the binary representation of `c`. */
  def trailingOnes(c: Long): Int = java.lang.Long.numberOfTrailingZeros(~c)

  /** Number of sections the next scheduled compaction involves:
    * z(C)+1 clamped to `numSections − 1` (the last section is special-only;
    * Observation 17 guarantees the clamp is never active in the streaming
    * setting and only defends against adversarial merge orders).
    */
  def nextCompactionSections: Int =
    math.min(trailingOnes(state) + 1, math.max(1, numSections - 1))

  /** Scheduled compaction (Algorithm 1 lines 6–13 / Algorithm 4 line 17).
    * Pre-condition: `size >= capacity`. Returns the promoted items (half of
    * the compacted range, odd or even indexed uniformly at random); the
    * lowest `B − L` items stay in the buffer.
    */
  def compact(rng: java.util.Random): Array[Double] = {
    require(isAtCapacity, s"compact() called on non-full buffer ($size < $capacity)")
    compactFrom(capacity - nextCompactionSections * k, rng)
  }

  /** Special compaction (Appendix C): keep only the B/2 smallest items,
    * compacting everything above. No-op (returns empty, state unchanged)
    * when at most B/2 items are stored.
    */
  def specialCompact(rng: java.util.Random): Array[Double] = {
    if (buf.size <= capacity / 2) Array.emptyDoubleArray
    else compactFrom(capacity / 2, rng)
  }

  /** Compact the sorted suffix starting at 0-based index `from`; promote a
    * uniformly random odd/even half of it (an odd-sized range promotes
    * ⌊c/2⌋ or ⌈c/2⌉ items — unbiased, Algorithm 4 line 30).
    */
  private def compactFrom(from: Int, rng: java.util.Random): Array[Double] = {
    val arr = buf.toArray
    java.util.Arrays.sort(arr)
    val lo = math.max(0, math.min(from, arr.length))
    val count = arr.length - lo
    if (count <= 0) return Array.emptyDoubleArray
    val offset = if (rng.nextBoolean()) 1 else 0
    val out = new ArrayBuffer[Double]((count + 1) / 2)
    var i = lo + offset
    while (i < arr.length) { out += arr(i); i += 2 }
    buf.clear()
    var j = 0
    while (j < lo) { buf += arr(j); j += 1 }
    state += 1
    out.toArray
  }

  /** Merge-time parameter refresh (N-squaring): capacity grows, items and
    * state are retained.
    */
  def setParams(newK: Int, newNumSections: Int): Unit = {
    require(newK >= 2 && newK % 2 == 0 && newNumSections >= 2)
    k = newK
    numSections = newNumSections
  }

  /** Combine schedule states by bitwise OR (Algorithm 4 line 11). */
  def absorbState(otherState: Long): Unit = state |= otherState
}
