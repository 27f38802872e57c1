package repro.seq

import repro.graph.LocalGraph

/** Sequential k-core algorithms: the BZ baseline, a naive reference, and a
  * sequential run of the paper's framework (Alg. 1) that also measures the
  * peeling complexity ρ.
  */
object SeqKCore {

  /** Batagelj–Zaversnik O(n+m) bucket-sort peeling — the paper's sequential
    * baseline ("BZ*" column of Tab. 2) and the gold standard every parallel
    * configuration is checked against.
    */
  def bz(g: LocalGraph): Array[Int] = {
    val n = g.n
    val deg = Array.tabulate(n)(g.degree)
    val maxDeg = if (n == 0) 0 else deg.max
    // Counting sort of vertices by degree.
    val bin = new Array[Int](maxDeg + 2)
    var v = 0
    while (v < n) { bin(deg(v)) += 1; v += 1 }
    var start = 0
    var d = 0
    while (d <= maxDeg) { val c = bin(d); bin(d) = start; start += c; d += 1 }
    val pos = new Array[Int](n)   // position of vertex in vert
    val vert = new Array[Int](n)  // vertices sorted by current degree
    v = 0
    while (v < n) { pos(v) = bin(deg(v)); vert(pos(v)) = v; bin(deg(v)) += 1; v += 1 }
    // Restore bin starts.
    d = maxDeg
    while (d > 0) { bin(d) = bin(d - 1); d -= 1 }
    bin(0) = 0
    val core = new Array[Int](n)
    var i = 0
    while (i < n) {
      val u = vert(i)
      core(u) = deg(u)
      g.foreachNeighbor(u) { w =>
        if (deg(w) > deg(u)) {
          // Swap w with the first vertex of its bucket, then shrink bucket.
          val dw = deg(w); val pw = pos(w)
          val ps = bin(dw); val s = vert(ps)
          if (s != w) {
            vert(ps) = w; vert(pw) = s
            pos(w) = ps; pos(s) = pw
          }
          bin(dw) += 1
          deg(w) -= 1
        }
      }
      i += 1
    }
    core
  }

  /** Naive quadratic peeling — an independent reference used only to verify
    * BZ in property tests.
    */
  def naive(g: LocalGraph): Array[Int] = {
    val n = g.n
    val deg = Array.tabulate(n)(g.degree)
    val removed = new Array[Boolean](n)
    val core = new Array[Int](n)
    var remaining = n
    var k = 0
    while (remaining > 0) {
      var progress = true
      while (progress) {
        progress = false
        var v = 0
        while (v < n) {
          if (!removed(v) && deg(v) <= k) {
            removed(v) = true; core(v) = k; remaining -= 1; progress = true
            g.foreachNeighbor(v)(u => if (!removed(u)) deg(u) -= 1)
          }
          v += 1
        }
      }
      k += 1
    }
    core
  }

  /** Result of a sequential framework run (Alg. 1, offline subround
    * structure): coreness, kmax, and the peeling complexity ρ — the number of
    * subrounds with a non-empty frontier when peeling batch-synchronously.
    */
  final case class SeqResult(core: Array[Int], kmax: Int, rho: Int, rounds: Int)

  /** Sequential execution of the paper's framework (Alg. 1). Frontier-based:
    * each inner iteration is one subround; ρ counts subrounds that actually
    * peel at least one vertex (matching Julienne's peeling complexity, which
    * the paper reports as the ρ column of Tab. 2).
    */
  def framework(g: LocalGraph): SeqResult = {
    val n = g.n
    val deg = Array.tabulate(n)(g.degree)
    val assigned = new Array[Boolean](n)
    val core = new Array[Int](n)
    // Active set as a compact array, repacked each round (Alg. 1 line 9).
    var active = Array.range(0, n)
    var k = 0
    var rho = 0
    var rounds = 0
    var frontier = new Array[Int](0)
    val buf = new scala.collection.mutable.ArrayBuilder.ofInt
    while (active.nonEmpty) {
      rounds += 1
      // Initial frontier of round k.
      buf.clear()
      var i = 0
      while (i < active.length) {
        val v = active(i)
        if (!assigned(v) && deg(v) == k) { assigned(v) = true; buf += v }
        i += 1
      }
      frontier = buf.result()
      while (frontier.nonEmpty) {
        rho += 1
        buf.clear()
        var j = 0
        while (j < frontier.length) {
          val v = frontier(j)
          core(v) = k
          g.foreachNeighbor(v) { u =>
            if (!assigned(u)) {
              deg(u) -= 1
              if (deg(u) == k) { assigned(u) = true; buf += u }
            }
          }
          j += 1
        }
        frontier = buf.result()
      }
      // Refine the active set: keep vertices with induced degree > k.
      active = active.filter(v => !assigned(v))
      k += 1
    }
    SeqResult(core, if (n == 0) 0 else core.max, rho, rounds)
  }

  /** Maximum k'-core subgraph (paper Appendix B): the vertex set of the
    * maximal subgraph where every vertex has degree ≥ k, found by direct
    * peeling without a full decomposition.
    */
  def maxKCoreVertices(g: LocalGraph, k: Int): Array[Int] = {
    val n = g.n
    val deg = Array.tabulate(n)(g.degree)
    val removed = new Array[Boolean](n)
    val queue = new java.util.ArrayDeque[Integer]()
    var v = 0
    while (v < n) { if (deg(v) < k) { removed(v) = true; queue.add(v) }; v += 1 }
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      g.foreachNeighbor(u) { w =>
        if (!removed(w)) {
          deg(w) -= 1
          if (deg(w) < k) { removed(w) = true; queue.add(w) }
        }
      }
    }
    Array.range(0, n).filter(v => !removed(v))
  }
}
