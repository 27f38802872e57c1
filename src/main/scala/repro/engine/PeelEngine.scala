package repro.engine

import org.apache.spark.rdd.RDD
import org.apache.spark.storage.StorageLevel
import repro.core.KCoreConfig
import scala.collection.mutable.ArrayBuilder

/** Raised when a sampled vertex's exact recount shows it missed its peeling
  * round (paper §4.1.4) — the caller restarts with sampling disabled.
  */
final class SamplingError(msg: String) extends RuntimeException(msg)

/** Weights used when folding counters into the modeled critical path. */
object CostWeights {
  /** Unit-ops charged per serialized atomic update at a contended vertex.
    * Under contention every CAS costs a cross-core cache-line transfer plus
    * retries (~50–100 ns on the paper's 4-socket Xeons vs ~1 ns per plain
    * op), and the updates to one location are inherently serial — so the
    * hottest vertex contributes maxInbound × this weight to the subround's
    * critical path.
    */
  val Contention = 64
}

/** Aggregated metrics of one parallel k-core run (feeds the cost model and
  * the table harnesses).
  *
  * @param subrounds         total BSP subrounds executed (Spark jobs — each
  *                          one pays the scheduling overhead ω)
  * @param subroundsNonEmpty subrounds that peeled ≥ 1 vertex — the paper's
  *                          peeling complexity ρ (ρ′ with VGC)
  * @param spanOps           Σ over subrounds of the max per-partition work —
  *                          the modeled critical path excluding ω
  * @param maxContention     max messages landing on a single vertex in one
  *                          subround (the atomic-contention analogue)
  */
final case class RunMetrics(
    algo: String,
    wallMillis: Double,
    rounds: Int,
    subrounds: Int,
    subroundsNonEmpty: Int,
    work: Long,
    edgeTraversals: Long,
    structOps: Long,
    histogramOps: Long,
    decMsgs: Long,
    hitMsgs: Long,
    localDecs: Long,
    inboundApplied: Long,
    maxContention: Int,
    spanOps: Long,
    maxSampled: Int,
    restarts: Int)

/** The BSP peeling engine: driver-orchestrated subrounds over an
  * `RDD[PartitionState]`, with broadcast inboxes and collected outboxes.
  * See DESIGN.md §5 for the full protocol.
  */
object PeelEngine {

  /** Run k-core under `cfg` over a cached base graph. Restarts without
    * sampling if a recount detects a missed peel (never observed with the
    * default μ — exercised in tests by forcing a tiny μ).
    */
  def run(base: RDD[PartitionGraph], n: Int, maxDeg: Int, cfg: KCoreConfig): (Array[Int], RunMetrics) = {
    var attempt = cfg
    var restarts = 0
    while (true) {
      try {
        val (core, m) = runOnce(base, n, maxDeg, attempt)
        return (core, m.copy(restarts = restarts))
      } catch {
        case e: SamplingError =>
          require(attempt.sampling.isDefined, s"sampling error without sampling: ${e.getMessage}")
          restarts += 1
          attempt = attempt.withoutSampling
      }
    }
    throw new IllegalStateException("unreachable")
  }

  private def runOnce(base: RDD[PartitionGraph], n: Int, maxDeg: Int,
                      cfg: KCoreConfig): (Array[Int], RunMetrics) = {
    val sc = base.sparkContext
    val nParts = cfg.nParts
    val t0 = System.nanoTime()

    // --- init ---------------------------------------------------------------
    val initRdd = base
      .mapPartitions(it => it.map(g => PartitionState.init(g, cfg, maxDeg)), preservesPartitioning = true)
      .persist(StorageLevel.MEMORY_ONLY)
    val dirInit = initRdd.map(t => (t._2, t._3)).collect()
    var state: RDD[PartitionState] = initRdd.map(_._1)
    var prevCached: RDD[_] = initRdd

    var in = SubroundIn.initial(nParts,
      dirInit.iterator.flatMap(_._1).toArray,
      dirInit.iterator.flatMap(_._2).toArray)

    // --- metrics accumulators ----------------------------------------------
    var k = 0
    var sub = 0
    var rounds = 0
    var rhoPrime = 0
    var work = 0L; var edges = 0L; var structOps = 0L; var histOps = 0L
    var decMsgs = 0L; var hitMsgs = 0L; var localDecs = 0L; var inbound = 0L
    var spanOps = 0L
    var maxContention = 0
    var maxSampled = 0

    var done = false
    var lastPair: RDD[(PartitionState, SubroundOut)] = null
    while (!done) {
      if (in.roundStart) rounds += 1
      val bc = sc.broadcast(in)
      val pair = state.mapPartitionsWithIndex({ (_, it) =>
        it.map { st0 =>
          val st = st0.deepCopy()
          val out = SubroundProcessor.process(st, bc.value, cfg)
          (st, out)
        }
      }, preservesPartitioning = true)
      if (cfg.checkpointEvery > 0 && sub % cfg.checkpointEvery == cfg.checkpointEvery - 1)
        pair.localCheckpoint()
      else
        pair.persist(StorageLevel.MEMORY_ONLY)
      val outs = pair.map(_._2).collect().sortBy(_.pid)
      bc.unpersist(false)
      prevCached.unpersist(false)
      prevCached = pair
      lastPair = pair
      state = pair.map(_._1)
      sub += 1

      // --- aggregate --------------------------------------------------------
      var peeledTotal = 0
      var frontierTotal = 0
      var pendingTotal = 0
      var msgsTotal = 0L
      var processedThisSub = 0
      var maxWork = 0L
      var sampledNow = 0
      var anyError = false
      outs.foreach { o =>
        peeledTotal += o.peeledOwnedTotal
        frontierTotal += o.localFrontierSize
        pendingTotal += o.pendingRecounts
        msgsTotal += o.outDecs.map(_.length.toLong).sum + o.outHits.map(_.length.toLong).sum
        processedThisSub += o.counters.frontierProcessed
        sampledNow += o.sampledNow
        anyError ||= o.error
        val c = o.counters
        work += c.work; edges += c.edgeTraversals; structOps += c.structOps
        histOps += c.histogramOps; decMsgs += c.decMsgs; hitMsgs += c.hitMsgs
        localDecs += c.localDecs; inbound += c.inboundApplied
        // Subround critical path: the longest serial chain (a single local
        // search — unbounded for PKC, ≤128 for VGC) plus the serialized
        // contention at the hottest vertex (atomic updates to one location
        // serialize; each costs ~ContentionWeight cache transfers).
        val span = c.maxChainOps + CostWeights.Contention.toLong * c.maxInboundPerVertex
        if (span > maxWork) maxWork = span
        if (c.maxInboundPerVertex > maxContention) maxContention = c.maxInboundPerVertex
      }
      spanOps += maxWork
      if (processedThisSub > 0) rhoPrime += 1
      if (sampledNow > maxSampled) maxSampled = sampledNow
      if (anyError && cfg.sampling.isDefined)
        throw new SamplingError(s"missed peel detected at round $k subround $sub")

      // --- route ------------------------------------------------------------
      val peeledDelta = concat(outs.map(_.newlyPeeled))
      val dirRemove = concat(outs.map(_.dirRemove))
      val dirAdd = concat(outs.map(_.dirAdd))
      val dirAddRate = concatD(outs.map(_.dirAddRate))
      val offline = outs.head.outDecCounts != null

      if (frontierTotal == 0 && msgsTotal == 0 && pendingTotal == 0) {
        if (peeledTotal >= n) done = true
        else {
          k += 1
          in = SubroundIn(k, roundStart = true, sub,
            Array.fill(nParts)(Array.emptyIntArray), null,
            Array.fill(nParts)(Array.emptyIntArray),
            peeledDelta, dirRemove, dirAdd, dirAddRate)
        }
      } else {
        val decs = Array.tabulate(nParts)(p => concat(outs.map(_.outDecs(p))))
        val cnts = if (offline) Array.tabulate(nParts)(p => concat(outs.map(_.outDecCounts(p)))) else null
        val hits = Array.tabulate(nParts)(p => concat(outs.map(_.outHits(p))))
        in = SubroundIn(k, roundStart = false, sub, decs, cnts, hits,
          peeledDelta, dirRemove, dirAdd, dirAddRate)
      }
    }

    // --- collect result -----------------------------------------------------
    val core = new Array[Int](n)
    lastPair.map(_._1).flatMap { st =>
      st.core.indices.iterator.map(i => (st.g.lo + i, st.core(i)))
    }.collect().foreach { case (v, c) => core(v) = c }
    prevCached.unpersist(false)

    val wall = (System.nanoTime() - t0) / 1e6
    val metrics = RunMetrics(cfg.name, wall, rounds, sub, rhoPrime, work, edges,
      structOps, histOps, decMsgs, hitMsgs, localDecs, inbound, maxContention,
      spanOps, maxSampled, 0)
    (core, metrics)
  }

  private def concat(arrs: Seq[Array[Int]]): Array[Int] = {
    val total = arrs.iterator.map(_.length).sum
    val out = new Array[Int](total)
    var off = 0
    arrs.foreach { a => System.arraycopy(a, 0, out, off, a.length); off += a.length }
    out
  }

  private def concatD(arrs: Seq[Array[Double]]): Array[Double] = {
    val total = arrs.iterator.map(_.length).sum
    val out = new Array[Double](total)
    var off = 0
    arrs.foreach { a => System.arraycopy(a, 0, out, off, a.length); off += a.length }
    out
  }
}
