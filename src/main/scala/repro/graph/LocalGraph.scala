package repro.graph

import scala.collection.mutable.ArrayBuilder

/** An undirected graph in CSR form, canonical for the whole reproduction.
  *
  * Both directions of every undirected edge are stored, the adjacency of each
  * vertex is sorted, self-loops and duplicate edges have been removed. `m` is
  * the number of undirected edges, so `adj.length == 2 * m`.
  *
  * The driver-side sequential algorithms (BZ, the naive reference, the ρ
  * counter) run directly on this structure; the Spark surface is produced by
  * [[GraphOps.toDF]] and the distributed CSR build is tested for equality
  * against it.
  */
final case class LocalGraph(n: Int, indptr: Array[Int], adj: Array[Int]) {
  /** Number of undirected edges. */
  def m: Long = adj.length / 2L

  /** Degree of vertex v in the input graph. */
  def degree(v: Int): Int = indptr(v + 1) - indptr(v)

  def maxDegree: Int = {
    var mx = 0; var v = 0
    while (v < n) { val d = degree(v); if (d > mx) mx = d; v += 1 }
    mx
  }

  def avgDegree: Double = if (n == 0) 0.0 else adj.length.toDouble / n

  /** Iterate neighbors of v through `f`. */
  @inline def foreachNeighbor(v: Int)(f: Int => Unit): Unit = {
    var i = indptr(v)
    val end = indptr(v + 1)
    while (i < end) { f(adj(i)); i += 1 }
  }
}

object LocalGraph {

  /** Build the canonical undirected CSR from a raw directed pair list.
    *
    * Self-loops are dropped; each surviving pair is inserted in both
    * directions; duplicates (either from the generator or from the
    * symmetrization) are removed.
    */
  def fromPairs(n: Int, srcs: Array[Int], dsts: Array[Int]): LocalGraph = {
    require(srcs.length == dsts.length, "src/dst length mismatch")
    // Pack both directions as src.toLong << 32 | dst, sort, dedup.
    val packed = new ArrayBuilder.ofLong
    packed.sizeHint(srcs.length * 2)
    var i = 0
    while (i < srcs.length) {
      val s = srcs(i); val d = dsts(i)
      require(s >= 0 && s < n && d >= 0 && d < n, s"edge ($s,$d) out of range [0,$n)")
      if (s != d) {
        packed += (s.toLong << 32) | (d.toLong & 0xffffffffL)
        packed += (d.toLong << 32) | (s.toLong & 0xffffffffL)
      }
      i += 1
    }
    val arr = packed.result()
    java.util.Arrays.sort(arr)
    // Dedup in place.
    var w = 0
    i = 0
    while (i < arr.length) {
      if (w == 0 || arr(w - 1) != arr(i)) { arr(w) = arr(i); w += 1 }
      i += 1
    }
    val indptr = new Array[Int](n + 1)
    val adj = new Array[Int](w)
    i = 0
    while (i < w) {
      val s = (arr(i) >>> 32).toInt
      indptr(s + 1) += 1
      adj(i) = arr(i).toInt
      i += 1
    }
    var v = 0
    while (v < n) { indptr(v + 1) += indptr(v); v += 1 }
    LocalGraph(n, indptr, adj)
  }

  /** Convenience: build from a list of (u, v) pairs. */
  def fromEdgeSeq(n: Int, edges: Seq[(Int, Int)]): LocalGraph =
    fromPairs(n, edges.map(_._1).toArray, edges.map(_._2).toArray)
}
