package repro.structures

import scala.collection.mutable.ArrayBuilder

/** Hierarchical Bucketing Structure (paper §5.2–5.3).
  *
  * Entries are (vertex, key) pairs. Relative to the current minimum key k,
  * the first 8 buckets are single-key (k … k+7, stored circularly by
  * key mod 8) and ranged bucket 8+t covers [k + 8·2^t, k + 8·2^{t+1} − 1].
  * `decreaseKey` inserts a fresh copy without deleting the old one — stale
  * copies (stored key ≠ current key, or vertex no longer alive) are filtered
  * on extraction, exactly as in the paper's hash-bag-based design, so the
  * latest copy of a vertex always carries its current induced degree.
  *
  * Ranged buckets are redistributed lazily: each ranged bucket tracks a lower
  * bound on the keys it holds; when that bound falls inside the single-key
  * window [k, k+8) the bucket is drained and its live entries re-placed under
  * the current layout. Every touch moves an entry to a smaller-range bucket,
  * giving the O(log d(v)) per-vertex bound of §5.2.
  *
  * Single-threaded per engine partition; `opsCost` accumulates structure
  * operations for the cost model.
  */
final class Hbs(val maxKey: Int) extends Serializable {

  import Hbs._

  private val nRanged = ceilLog2(math.max(1, (maxKey >> 3) + 2)) + 2
  // singles(s) holds keys ≡ s (mod 8) within the current window [k, k+8).
  private var singles: Array[Array[Long]] = Array.fill(8)(EmptyArr)
  private val singleSz: Array[Int] = new Array[Int](8)
  private var ranged: Array[Array[Long]] = Array.fill(nRanged)(EmptyArr)
  private val rangedSz: Array[Int] = new Array[Int](nRanged)
  private val rangedMin: Array[Int] = Array.fill(nRanged)(Int.MaxValue)
  private var k: Int = 0
  /** Structure operations performed so far (inserts + scans), for CostModel. */
  var opsCost: Long = 0L

  /** Ranged bucket index for an offset d = key − k with d ≥ 8. */
  @inline private def rangedIdx(d: Int): Int = {
    val t = 31 - Integer.numberOfLeadingZeros(d >>> 3)
    math.min(nRanged - 1, t)
  }

  /** Logical bucket index of offset d = key − k: the first 8 buckets are
    * single-key, bucket 8+t covers [8·2^t, 8·2^{t+1}).
    */
  def bucketIdx(d: Int): Int = if (d < 8) math.max(0, d) else 8 + rangedIdx(d)

  private def push(store: Array[Array[Long]], szs: Array[Int], b: Int, e: Long): Array[Array[Long]] = {
    if (szs(b) == store(b).length) {
      val cap = math.max(8, store(b).length * 2)
      store(b) = java.util.Arrays.copyOf(store(b), cap)
    }
    store(b)(szs(b)) = e
    szs(b) += 1
    store
  }

  def insert(v: Int, key: Int): Unit = {
    opsCost += 1
    val e = pack(v, key)
    val d = key - k
    if (d < 8) singles = push(singles, singleSz, ((key % 8) + 8) % 8, e)
    else {
      val b = rangedIdx(d)
      ranged = push(ranged, rangedSz, b, e)
      if (key < rangedMin(b)) rangedMin(b) = key
    }
  }

  /** DecreaseKey — insert a fresh copy; old copies filtered lazily. */
  def decreaseKey(v: Int, newKey: Int): Unit = insert(v, newKey)

  def totalEntries: Int = singleSz.sum + rangedSz.sum

  /** Extract the frontier for round `kRound`: every alive vertex whose
    * current key equals `kRound`. `currentKey`/`alive` come from the
    * partition state (induced-degree array / assigned flags).
    */
  def extractForRound(kRound: Int, currentKey: Int => Int, alive: Int => Boolean): Array[Int] = {
    k = kRound
    // Pull down any ranged bucket that may hold keys inside [k, k+8).
    var again = true
    while (again) {
      again = false
      var b = 0
      while (b < nRanged) {
        if (rangedSz(b) > 0 && rangedMin(b) < kRound + 8) {
          val arr = ranged(b); val sz = rangedSz(b)
          ranged(b) = EmptyArr; rangedSz(b) = 0; rangedMin(b) = Int.MaxValue
          var i = 0
          while (i < sz) {
            val e = arr(i); val v = unpackV(e); val key = unpackK(e)
            opsCost += 1
            // Keep only the live latest copy; drop keys below the window
            // (a fresher copy exists, or the vertex was peeled).
            if (alive(v) && currentKey(v) == key && key >= kRound) insert(v, key)
            i += 1
          }
          again = true
        }
        b += 1
      }
    }
    // Drain the single-key slot for kRound.
    val slot = ((kRound % 8) + 8) % 8
    val arr = singles(slot); val sz = singleSz(slot)
    singles(slot) = EmptyArr; singleSz(slot) = 0
    val out = new ArrayBuilder.ofInt
    var i = 0
    while (i < sz) {
      val e = arr(i); val v = unpackV(e)
      opsCost += 1
      if (alive(v) && currentKey(v) == kRound) out += v
      i += 1
    }
    Hbs.dedupSorted(out.result())
  }

  def deepCopy(): Hbs = {
    val c = new Hbs(maxKey)
    var i = 0
    while (i < 8) {
      c.singles(i) = if (singleSz(i) == 0) EmptyArr else java.util.Arrays.copyOf(singles(i), singleSz(i))
      c.singleSz(i) = singleSz(i)
      i += 1
    }
    i = 0
    while (i < nRanged) {
      c.ranged(i) = if (rangedSz(i) == 0) EmptyArr else java.util.Arrays.copyOf(ranged(i), rangedSz(i))
      c.rangedSz(i) = rangedSz(i)
      c.rangedMin(i) = rangedMin(i)
      i += 1
    }
    c.k = k
    c.opsCost = opsCost
    c
  }
}

object Hbs {
  private val EmptyArr = new Array[Long](0)
  @inline private def pack(v: Int, key: Int): Long = (key.toLong << 32) | (v.toLong & 0xffffffffL)
  @inline private def unpackV(e: Long): Int = e.toInt
  @inline private def unpackK(e: Long): Int = (e >>> 32).toInt
  private def ceilLog2(x: Int): Int = 32 - Integer.numberOfLeadingZeros(math.max(1, x - 1))

  /** Sort + dedup an int array (a vertex may have several live copies). */
  def dedupSorted(raw: Array[Int]): Array[Int] = {
    if (raw.length <= 1) return raw
    java.util.Arrays.sort(raw)
    var w = 0; var i = 0
    while (i < raw.length) {
      if (w == 0 || raw(w - 1) != raw(i)) { raw(w) = raw(i); w += 1 }
      i += 1
    }
    java.util.Arrays.copyOf(raw, w)
  }
}
