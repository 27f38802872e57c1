package repro.structures

/** Chunked hash bag of non-negative ints (paper §2, "Parallel Hash Bag").
  *
  * The backing array is conceptually divided into chunks of sizes λ, 2λ, 4λ…
  * Insertions go to the current chunk via linear probing (set semantics — a
  * duplicate insert is a no-op); once the chunk passes the load factor the
  * next chunk opens. `extractAll` only scans the prefix of chunks that were
  * ever used, so it costs O(λ + t) for t elements.
  *
  * In the original paper the bag is concurrent; here each instance is owned
  * by a single partition of the BSP engine, so operations are sequential but
  * the structure and its costs are the same.
  */
final class HashBag private (
    private var slots: Array[Int],
    private var chunkEnd: Int,     // exclusive end of the open chunk
    private var chunkStart: Int,   // inclusive start of the open chunk
    private var fill: Int,         // filled slots in the open chunk
    private var total: Int) {

  import HashBag._

  def this(capacityHint: Int) = {
    this(null, 0, 0, 0, 0)
    var cap = Lambda
    while (cap < capacityHint * 2) cap *= 2
    slots = Array.fill(cap)(Empty)
    chunkStart = 0
    chunkEnd = Lambda
  }

  def size: Int = total

  /** Probe one chunk [start, end) for v. Returns the slot index where v sits,
    * or -(free slot)-1 if absent (and the chunk has room), or Int.MinValue if
    * the chunk is full without v.
    */
  private def probeChunk(start: Int, end: Int, v: Int): Int = {
    val width = end - start
    var idx = start + (mix(v) & (width - 1))
    var probes = 0
    while (probes < width) {
      val cur = slots(idx)
      if (cur == Empty) return -idx - 1
      if (cur == v) return idx
      idx += 1
      if (idx == end) idx = start
      probes += 1
    }
    Int.MinValue
  }

  /** Insert v; returns true if v was not already present (set semantics —
    * every used chunk is probed, costing O(#chunks) = O(log(size/λ))).
    */
  def insert(v: Int): Boolean = {
    require(v >= 0, "HashBag stores non-negative ints")
    if (fill * 4 >= (chunkEnd - chunkStart) * 3) advanceChunk()
    // Check all sealed chunks for a duplicate.
    var start = 0
    var width = Lambda
    while (start < chunkStart) {
      val r = probeChunk(start, start + width, v)
      if (r >= 0) return false
      start += width
      width *= 2
    }
    val r = probeChunk(chunkStart, chunkEnd, v)
    if (r >= 0) return false
    if (r == Int.MinValue) { advanceChunk(); return insert(v) }
    slots(-r - 1) = v
    fill += 1
    total += 1
    true
  }

  private def advanceChunk(): Unit = {
    val width = chunkEnd - chunkStart
    while (chunkEnd + width * 2 > slots.length) {
      // Grow the backing array (keeps prefix layout intact).
      val bigger = Array.fill(slots.length * 2)(Empty)
      System.arraycopy(slots, 0, bigger, 0, chunkEnd)
      slots = bigger
    }
    chunkStart = chunkEnd
    chunkEnd = chunkEnd + width * 2
    fill = 0
  }

  /** Extract every element into a fresh array and reset the bag. Scans only
    * the used prefix.
    */
  def extractAll(): Array[Int] = {
    val out = new Array[Int](total)
    var w = 0
    var i = 0
    while (i < chunkEnd) {
      val v = slots(i)
      if (v != Empty) { out(w) = v; w += 1; slots(i) = Empty }
      i += 1
    }
    chunkStart = 0
    chunkEnd = Lambda
    fill = 0
    total = 0
    out
  }

  /** Slots scanned by the next extractAll — the structure's λ + t bound. */
  def usedPrefix: Int = chunkEnd

  def copy(): HashBag = new HashBag(slots.clone(), chunkEnd, chunkStart, fill, total)
}

object HashBag {
  /** λ — the first chunk size (2^8 as in the paper's implementation). */
  val Lambda = 256
  private val Empty = -1

  private def mix(x: Int): Int = {
    var h = x * 0x9e3779b9
    h ^= h >>> 16
    h & 0x7fffffff
  }
}
