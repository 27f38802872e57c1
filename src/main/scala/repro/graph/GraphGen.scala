package repro.graph

import java.util.Random
import scala.collection.mutable.ArrayBuilder

/** Deterministic synthetic graph generators.
  *
  * Each generator returns a raw directed pair list (`EdgeList`); callers
  * compose several of them (with vertex-id offsets) and canonicalize through
  * [[LocalGraph.fromPairs]], which symmetrizes and deduplicates. All
  * randomness is seeded, so a graph is a pure function of its parameters.
  *
  * These are the laptop-scale analogues of the paper's 25 evaluation graphs
  * (see DESIGN.md §4 for the mapping and the behaviour each one drives).
  */
object GraphGen {

  /** A growable raw edge list (directed pairs, possibly duplicated). */
  final class EdgeList {
    private val sb = new ArrayBuilder.ofInt
    private val db = new ArrayBuilder.ofInt
    private var cnt = 0
    def add(u: Int, v: Int): Unit = { sb += u; db += v; cnt += 1 }
    def size: Int = cnt
    def srcs: Array[Int] = sb.result()
    def dsts: Array[Int] = db.result()
  }

  /** Barabási–Albert preferential attachment: each new vertex attaches to
    * `m0` distinct earlier vertices sampled proportionally to degree.
    * Vertices are `offset until offset + n`. Degeneracy of a pure BA graph
    * is exactly `m0`.
    */
  def ba(el: EdgeList, n: Int, m0: Int, seed: Long, offset: Int = 0): Unit = {
    require(n > m0 + 1, s"BA needs n > m0+1 (n=$n m0=$m0)")
    val rng = new Random(seed)
    // `repeated` holds one entry per edge endpoint — sampling uniformly from
    // it is sampling proportional to degree.
    val repeated = new ArrayBuilder.ofInt
    // Seed nucleus: a ring over the first m0+1 vertices.
    var i = 0
    while (i <= m0) {
      val u = offset + i; val v = offset + ((i + 1) % (m0 + 1))
      el.add(u, v); repeated += u; repeated += v
      i += 1
    }
    var rep = repeated.result().toBuffer
    var v = m0 + 1
    while (v < n) {
      val chosen = new java.util.HashSet[Int]()
      var tries = 0
      while (chosen.size < m0 && tries < m0 * 30) {
        val t = rep(rng.nextInt(rep.size))
        if (t != offset + v) chosen.add(t)
        tries += 1
      }
      val it = chosen.iterator()
      while (it.hasNext) {
        val t = it.next()
        el.add(offset + v, t)
        rep += t; rep += (offset + v)
      }
      v += 1
    }
  }

  /** Erdős–Rényi block G(c, p) over vertices `offset until offset + c` —
    * plants a dense community whose coreness is ≈ c·p, mimicking the dense
    * cores of real social/web graphs.
    */
  def erBlock(el: EdgeList, c: Int, p: Double, seed: Long, offset: Int): Unit = {
    val rng = new Random(seed)
    var i = 0
    while (i < c) {
      var j = i + 1
      while (j < c) {
        if (rng.nextDouble() < p) el.add(offset + i, offset + j)
        j += 1
      }
      i += 1
    }
  }

  /** `h` celebrity hubs, each wired to a fraction `frac` of the `n` vertices
    * starting at `offset` — the degree-skew that triggers sampling.
    * Hub ids are the first `h` vertices of the range.
    */
  def hubs(el: EdgeList, n: Int, h: Int, frac: Double, seed: Long, offset: Int = 0): Unit = {
    val rng = new Random(seed)
    val fanout = math.max(1, (n * frac).toInt)
    var i = 0
    while (i < h) {
      var j = 0
      while (j < fanout) {
        val t = rng.nextInt(n)
        if (t != i) el.add(offset + i, offset + t)
        j += 1
      }
      i += 1
    }
  }

  /** 2-D grid `rows × cols` (4-neighborhood). With `diagFrac > 0`, each cell
    * additionally gets a diagonal with that probability — this creates
    * triangles and raises kmax from 2 to 3–4, the road-network regime.
    */
  def grid2d(el: EdgeList, rows: Int, cols: Int, diagFrac: Double, seed: Long,
             offset: Int = 0): Unit = {
    val rng = new Random(seed)
    var r = 0
    while (r < rows) {
      var c = 0
      while (c < cols) {
        val v = offset + r * cols + c
        if (c + 1 < cols) el.add(v, v + 1)
        if (r + 1 < rows) el.add(v, v + cols)
        if (diagFrac > 0 && r + 1 < rows && c + 1 < cols && rng.nextDouble() < diagFrac) {
          if (rng.nextBoolean()) el.add(v, v + cols + 1)
          else el.add(v + 1, v + cols)
        }
        c += 1
      }
      r += 1
    }
  }

  /** 3-D cube grid `x × y × z` (6-neighborhood), kmax = 3. */
  def cube3d(el: EdgeList, x: Int, y: Int, z: Int, offset: Int = 0): Unit = {
    var i = 0
    while (i < x) {
      var j = 0
      while (j < y) {
        var k = 0
        while (k < z) {
          val v = offset + (i * y + j) * z + k
          if (k + 1 < z) el.add(v, v + 1)
          if (j + 1 < y) el.add(v, v + z)
          if (i + 1 < x) el.add(v, v + y * z)
          k += 1
        }
        j += 1
      }
      i += 1
    }
  }

  /** k-nearest-neighbor graph over `n` uniform random points in the unit
    * square/cube (`dims` = 2 or 3). Each point gets a directed edge to its
    * `k` nearest neighbors (symmetrized by canonicalization). Exact kNN via
    * an expanding cell-grid search.
    */
  def knn(el: EdgeList, n: Int, k: Int, dims: Int, seed: Long, offset: Int = 0): Unit = {
    require(dims == 2 || dims == 3, "knn supports dims 2 or 3")
    val rng = new Random(seed)
    val pts = Array.fill(n, dims)(rng.nextDouble())
    // Cell grid with ~(k+1) expected points per cell.
    val cellsPerAxis = math.max(1, math.pow(n.toDouble / (k + 1), 1.0 / dims).toInt)
    val cellOf = (p: Array[Double]) => {
      var id = 0
      var d = 0
      while (d < dims) {
        val c = math.min(cellsPerAxis - 1, (p(d) * cellsPerAxis).toInt)
        id = id * cellsPerAxis + c
        d += 1
      }
      id
    }
    val nCells = math.pow(cellsPerAxis, dims).toInt
    val cellPts = Array.fill(nCells)(new ArrayBuilder.ofInt)
    var i = 0
    while (i < n) { cellPts(cellOf(pts(i))) += i; i += 1 }
    val cells = cellPts.map(_.result())

    val coord = (p: Array[Double], d: Int) =>
      math.min(cellsPerAxis - 1, (p(d) * cellsPerAxis).toInt)

    def dist2(a: Array[Double], b: Array[Double]): Double = {
      var s = 0.0; var d = 0
      while (d < dims) { val t = a(d) - b(d); s += t * t; d += 1 }
      s
    }

    i = 0
    val candD = new Array[Double](n)
    val candI = new Array[Int](n)
    while (i < n) {
      val p = pts(i)
      var radius = 1
      var found = 0
      // Expand the cell search radius until at least k candidates (besides i)
      // are strictly inside the guaranteed-complete ring.
      var done = false
      while (!done) {
        found = 0
        val c0 = coord(p, 0)
        val lo0 = math.max(0, c0 - radius); val hi0 = math.min(cellsPerAxis - 1, c0 + radius)
        val c1 = coord(p, 1)
        val lo1 = math.max(0, c1 - radius); val hi1 = math.min(cellsPerAxis - 1, c1 + radius)
        val (lo2, hi2) =
          if (dims == 3) {
            val c2 = coord(p, 2)
            (math.max(0, c2 - radius), math.min(cellsPerAxis - 1, c2 + radius))
          } else (0, 0)
        var a = lo0
        while (a <= hi0) {
          var b = lo1
          while (b <= hi1) {
            var c = lo2
            while (c <= hi2) {
              val cid = if (dims == 3) (a * cellsPerAxis + b) * cellsPerAxis + c
                        else a * cellsPerAxis + b
              val arr = cells(cid)
              var t = 0
              while (t < arr.length) {
                val q = arr(t)
                if (q != i) { candI(found) = q; candD(found) = dist2(p, pts(q)); found += 1 }
                t += 1
              }
              c += 1
            }
            b += 1
          }
          a += 1
        }
        val coveredAll = (hi0 - lo0 + 1) == cellsPerAxis && (hi1 - lo1 + 1) == cellsPerAxis &&
          (dims == 2 || (hi2 - lo2 + 1) == cellsPerAxis)
        if (found >= k + 2 * dims || coveredAll) done = true else radius += 1
      }
      // Partial selection of the k nearest among candidates.
      val kk = math.min(k, found)
      val idx = Array.range(0, found).sortBy(candD)
      var t = 0
      while (t < kk) { el.add(offset + i, offset + candI(idx(t))); t += 1 }
      i += 1
    }
  }

  /** Caterpillar mesh analogue (paper's TRCE/BBL): a chain of `nCycles`
    * 8-cycles ("bubbles", coreness 2) with a pendant path of length
    * `pathLen` hanging off each cycle (coreness 1). The pendant paths peel
    * one vertex per subround at k = 1, so ρ ≈ pathLen — the high-ρ sparse
    * regime where VGC shines.
    */
  def caterpillar(el: EdgeList, nCycles: Int, cycleLen: Int, pathLen: Int,
                  offset: Int = 0): Int = {
    var next = offset
    var prevAnchor = -1
    var c = 0
    while (c < nCycles) {
      val base = next
      var i = 0
      while (i < cycleLen) { el.add(base + i, base + ((i + 1) % cycleLen)); i += 1 }
      if (prevAnchor >= 0) el.add(prevAnchor, base)
      prevAnchor = base + cycleLen / 2
      next = base + cycleLen
      // Pendant path from one cycle vertex.
      var prev = base + 1
      var j = 0
      while (j < pathLen) { el.add(prev, next); prev = next; next += 1; j += 1 }
      c += 1
    }
    next - offset // number of vertices used
  }

  /** Dense random block: each of the `c` vertices picks `partners` random
    * partners (expected degree ≈ 2·partners). Its k-core collapses sharply
    * near the expected degree, so the whole block shares a high coreness and
    * stays in the active set for every peeling round up to kmax — the
    * high-coreness regime of the paper's HCNS graph.
    */
  def denseBlock(el: EdgeList, c: Int, partners: Int, seed: Long, offset: Int): Unit = {
    val rng = new Random(seed)
    var v = 0
    while (v < c) {
      var j = 0
      while (j < partners) {
        val t = rng.nextInt(c)
        if (t != v) el.add(offset + v, offset + t)
        j += 1
      }
      v += 1
    }
  }

  /** High-coreness synthetic graph (paper's HCNS): a clique K(kmax+1), one
    * chain vertex of coreness i for each 1 ≤ i < kmax (v_i is wired to i
    * clique members), and a ring of `padRing` coreness-2 vertices. The ring
    * makes the `O(kmax·n)` work of no-active-set algorithms (ParK/PKC)
    * visible: they rescan it in every one of the ~kmax rounds.
    */
  def hcns(el: EdgeList, kmax: Int, padRing: Int, offset: Int = 0): Int = {
    // Clique vertices: offset .. offset+kmax
    var i = 0
    while (i <= kmax) {
      var j = i + 1
      while (j <= kmax) { el.add(offset + i, offset + j); j += 1 }
      i += 1
    }
    var next = offset + kmax + 1
    // Chain vertices v_1 .. v_{kmax-1}: v_i has degree i (to clique members).
    i = 1
    while (i < kmax) {
      var j = 0
      while (j < i) { el.add(next, offset + j); j += 1 }
      next += 1
      i += 1
    }
    // Padding ring (coreness 2).
    if (padRing > 2) {
      val base = next
      var r = 0
      while (r < padRing) { el.add(base + r, base + ((r + 1) % padRing)); r += 1 }
      next += padRing
    }
    next - offset
  }
}
