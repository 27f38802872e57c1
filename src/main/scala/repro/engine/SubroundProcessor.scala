package repro.engine

import repro.core.{KCoreConfig, Offline, Online}
import scala.collection.mutable.ArrayBuilder

/** Executes one subround for one partition (the body of the engine's
  * `mapPartitions`). Mutates the (already deep-copied) state in place and
  * returns the partition's `SubroundOut`.
  *
  * Step order matters for the two-phase sampling exit protocol — see
  * DESIGN.md §5:
  *   1. apply the broadcast peeled-bitmap delta,
  *   2. apply incoming explicit decrements (crossings join this frontier),
  *   3. apply incoming sample hits (may schedule exits),
  *   4. on round start: extract the frontier from the bucket strategy and
  *      validate every sampled vertex,
  *   5. perform the exact recounts scheduled in the previous subround,
  *   6. peel the frontier (with VGC chains in Online mode).
  */
object SubroundProcessor {

  final class IntQueue(initial: Int) {
    private var arr = new Array[Int](math.max(4, initial))
    var size = 0
    def add(v: Int): Unit = {
      if (size == arr.length) arr = java.util.Arrays.copyOf(arr, arr.length * 2)
      arr(size) = v; size += 1
    }
    def apply(i: Int): Int = arr(i)
    def clear(): Unit = size = 0
  }

  def process(st: PartitionState, in: SubroundIn, cfg: KCoreConfig): SubroundOut = {
    val g = st.g
    val pid = g.pid
    val n = g.n
    val nParts = g.nParts
    val k = in.k
    val sp = cfg.sampling.orNull
    val mu = if (sp == null) Int.MaxValue else sp.mu(n)
    val rng = new java.util.Random(cfg.seed ^ (in.subroundIndex * 1000003L) ^ (pid * 7919L))
    val structOpsBefore = st.strategy.ops

    // --- counters -----------------------------------------------------------
    var work = 0L
    var edgeTraversals = 0L
    var decMsgs = 0L
    var hitMsgs = 0L
    var localDecs = 0L
    var histogramOps = 0L
    var inboundApplied = 0L
    var maxInbound = 0
    var maxChainOps = 0L
    var frontierProcessed = 0
    var error = false

    // --- outputs ------------------------------------------------------------
    val outDecs = Array.fill(nParts)(new ArrayBuilder.ofInt)
    val outHits = Array.fill(nParts)(new ArrayBuilder.ofInt)
    val histo: java.util.HashMap[Integer, Integer] =
      if (cfg.peel == Offline) new java.util.HashMap[Integer, Integer]() else null
    val newlyPeeled = new ArrayBuilder.ofInt
    val dirRemoveOut = new ArrayBuilder.ofInt
    val dirAddOut = new ArrayBuilder.ofInt
    val dirAddRateOut = new ArrayBuilder.ofDouble
    val pendingNext = new ArrayBuilder.ofInt
    var pendingNextCount = 0
    val nextFrontier = new ArrayBuilder.ofInt
    var nextFrontierCount = 0
    val newSampled = new ArrayBuilder.ofInt

    // Roots to peel this subround: carried-over frontier + additions below.
    val roots = new IntQueue(st.frontier.length + 8)
    var i = 0
    while (i < st.frontier.length) { roots.add(st.frontier(i)); i += 1 }

    @inline def beginExit(v: Int): Unit = {
      val j = st.li(v)
      st.mode(j) = 2
      dirRemoveOut += v
      pendingNext += v
      pendingNextCount += 1
    }

    // --- step 0: sampler-directory deltas ----------------------------------
    i = 0
    while (i < in.dirRemove.length) { st.dir.remove(Integer.valueOf(in.dirRemove(i))); i += 1 }
    i = 0
    while (i < in.dirAdd.length) {
      st.dir.put(Integer.valueOf(in.dirAdd(i)), java.lang.Double.valueOf(in.dirAddRate(i)))
      i += 1
    }

    // --- step 1: peeled-bitmap delta ----------------------------------------
    i = 0
    while (i < in.peeledDelta.length) { st.setPeeledBit(in.peeledDelta(i)); i += 1 }

    // --- step 2: incoming explicit decrements -------------------------------
    val inb = new java.util.HashMap[Integer, Integer]()
    val decT = in.decs(pid)
    val decC = if (in.decCounts != null) in.decCounts(pid) else null
    i = 0
    while (i < decT.length) {
      val t = decT(i)
      val c = if (decC != null) decC(i) else 1
      inboundApplied += c
      work += c
      val cur = inb.merge(Integer.valueOf(t), Integer.valueOf(c), (a, b) => Integer.valueOf(a + b))
      if (cur > maxInbound) maxInbound = cur
      val j = st.li(t)
      if (st.core(j) == -1) {
        if (st.mode(j) == 1) {
          // In-flight decrement to a vertex that just entered sample mode —
          // apply it; the degree stays a conservative upper bound.
          st.deg(j) -= c
          st.strategy.onDecrease(t, st.deg(j))
        } else if (st.mode(j) == 2) {
          // Recount pending; these peels are covered by the bitmap.
        } else {
          st.deg(j) -= c
          st.strategy.onDecrease(t, st.deg(j))
          if (st.deg(j) <= k) { st.core(j) = k; roots.add(t) }
        }
      }
      i += 1
    }

    // --- step 3: incoming sample hits ---------------------------------------
    val hitT = in.hits(pid)
    i = 0
    while (i < hitT.length) {
      val t = hitT(i)
      inboundApplied += 1
      work += 1
      val cur = inb.merge(Integer.valueOf(t), Integer.valueOf(1), (a, b) => Integer.valueOf(a + b))
      if (cur > maxInbound) maxInbound = cur
      val j = st.li(t)
      if (st.core(j) == -1 && st.mode(j) == 1) {
        st.cnt(j) += 1
        if (st.cnt(j) >= mu) beginExit(t)
      }
      i += 1
    }

    // --- step 4: round start — frontier extraction + validation -------------
    if (in.roundStart) {
      val alive = (v: Int) => st.core(st.li(v)) == -1
      val selectable = (v: Int) => st.mode(st.li(v)) == 0
      val extracted = st.strategy.extract(k, v => st.deg(st.li(v)), alive, selectable)
      i = 0
      while (i < extracted.length) {
        val v = extracted(i)
        val j = st.li(v)
        if (st.core(j) == -1) { st.core(j) = k; roots.add(v) }
        i += 1
      }
      // Validate all sampled owned vertices (Alg. 4 lines 5–6).
      if (sp != null && st.sampledOwned.length > 0) {
        val stillSampled = new ArrayBuilder.ofInt
        i = 0
        while (i < st.sampledOwned.length) {
          val v = st.sampledOwned(i)
          val j = st.li(v)
          work += 1
          if (st.core(j) == -1 && st.mode(j) == 1) {
            if (!sp.validate(st.deg(j), k, st.cnt(j), st.rateArr(j))) beginExit(v)
            else stillSampled += v
          }
          i += 1
        }
        st.sampledOwned = stillSampled.result()
      }
    }

    // --- step 5: exact recounts scheduled last subround ---------------------
    val toRecount = st.pendingRecount
    i = 0
    while (i < toRecount.length) {
      val v = toRecount(i)
      val j = st.li(v)
      if (st.core(j) == -1) {
        var trueDeg = 0
        g.foreachNeighborLocal(j) { u =>
          work += 1
          if (!st.isPeeledBit(u)) trueDeg += 1
        }
        st.deg(j) = trueDeg
        st.cnt(j) = 0
        st.strategy.onDecrease(v, trueDeg)
        if (trueDeg < k) {
          // The vertex's degree fell below k while sampled — a missed peel
          // (paper §4.1.4). Flag for restart; peel now as a best effort.
          error = true
          st.core(j) = k; st.mode(j) = 0; roots.add(v)
        } else if (trueDeg == k) {
          st.core(j) = k; st.mode(j) = 0; roots.add(v)
        } else if (sp != null && sp.canSample(trueDeg, k)) {
          st.mode(j) = 1
          st.rateArr(j) = sp.rateFor(trueDeg, n)
          dirAddOut += v
          dirAddRateOut += st.rateArr(j)
          newSampled += v
        } else {
          st.mode(j) = 0
        }
      }
      i += 1
    }
    st.pendingRecount = Array.emptyIntArray

    // --- step 6: peel the frontier ------------------------------------------
    val online = cfg.peel == Online
    val chain = new IntQueue(16)
    var r = 0
    while (r < roots.size) {
      val root = roots(r)
      r += 1
      if (!st.isPeeledBit(root)) {
        chain.clear()
        chain.add(root)
        var chainOps = 0L
        var qi = 0
        while (qi < chain.size) {
          val v = chain(qi)
          qi += 1
          val j = st.li(v)
          st.setPeeledBit(v)
          newlyPeeled += v
          st.peeledOwnedCount += 1
          frontierProcessed += 1
          work += 1
          chainOps += 1 + st.g.degreeLocal(j)
          g.foreachNeighborLocal(j) { u =>
            edgeTraversals += 1
            work += 1
            if (!online) {
              histo.merge(Integer.valueOf(u), Integer.valueOf(1), (a, b) => Integer.valueOf(a + b))
              histogramOps += 1
              work += 1
            } else if (g.owns(u)) {
              val ju = st.li(u)
              if (st.core(ju) == -1) {
                if (st.mode(ju) == 1) {
                  if (rng.nextDouble() < st.rateArr(ju)) {
                    st.cnt(ju) += 1
                    hitMsgs += 1
                    if (st.cnt(ju) >= mu) beginExit(u)
                  }
                } else if (st.mode(ju) == 2) {
                  // exiting: the recount will see v's peeled bit (set above)
                } else {
                  st.deg(ju) -= 1
                  localDecs += 1
                  st.strategy.onDecrease(u, st.deg(ju))
                  if (st.deg(ju) == k) {
                    st.core(ju) = k
                    if (cfg.vgcQueue > 0 && chain.size < cfg.vgcQueue) chain.add(u)
                    else { nextFrontier += u; nextFrontierCount += 1 }
                  }
                }
              }
            } else {
              val rt = st.dir.get(Integer.valueOf(u))
              if (rt != null) {
                if (rng.nextDouble() < rt.doubleValue()) {
                  outHits(Csr.ownerOf(u, n, nParts)) += u
                  hitMsgs += 1
                }
              } else {
                outDecs(Csr.ownerOf(u, n, nParts)) += u
                decMsgs += 1
              }
            }
          }
        }
        if (chainOps > maxChainOps) maxChainOps = chainOps
      }
    }

    // Offline mode: split the histogram into per-partition (target, count)
    // message arrays — including self-addressed ones (batch-synchronous
    // application next subround, Alg. 2).
    var outDecArrays: Array[Array[Int]] = null
    var outCntArrays: Array[Array[Int]] = null
    if (!online) {
      val decB = Array.fill(nParts)(new ArrayBuilder.ofInt)
      val cntB = Array.fill(nParts)(new ArrayBuilder.ofInt)
      val it = histo.entrySet().iterator()
      while (it.hasNext) {
        val e = it.next()
        val t = e.getKey.intValue()
        val p = Csr.ownerOf(t, n, nParts)
        decB(p) += t
        cntB(p) += e.getValue.intValue()
        decMsgs += 1
        work += 1
      }
      outDecArrays = decB.map(_.result())
      outCntArrays = cntB.map(_.result())
    } else {
      outDecArrays = outDecs.map(_.result())
    }

    st.frontier = nextFrontier.result()
    st.pendingRecount = pendingNext.result()
    val ns = newSampled.result()
    if (ns.nonEmpty) st.sampledOwned = st.sampledOwned ++ ns

    val structOps = st.strategy.ops - structOpsBefore
    work += structOps

    SubroundOut(
      pid,
      outDecArrays,
      outCntArrays,
      outHits.map(_.result()),
      newlyPeeled.result(),
      dirRemoveOut.result(),
      dirAddOut.result(),
      dirAddRateOut.result(),
      st.frontier.length,
      pendingNextCount,
      st.peeledOwnedCount,
      st.sampledOwned.length,
      SubCounters(work, edgeTraversals, decMsgs, hitMsgs, localDecs, structOps,
        histogramOps, inboundApplied, maxInbound, maxChainOps, frontierProcessed),
      error)
  }
}
