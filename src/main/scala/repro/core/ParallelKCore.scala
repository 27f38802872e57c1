package repro.core

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel
import repro.engine.{Csr, PartitionGraph, PeelEngine, RunMetrics}
import repro.graph.{GraphOps, LocalGraph}

/** A prepared (distributed, cached) graph that several configurations can
  * share — benches run 12 algorithms per graph over one CSR build.
  */
final case class GraphHandle(base: RDD[PartitionGraph], n: Int, maxDeg: Int, nParts: Int) {
  def unpersist(): Unit = base.unpersist(false)
}

/** Public API of the parallel k-core decomposition. */
object ParallelKCore {

  /** Distributed CSR build from a canonical symmetric edge DataFrame. */
  def prepare(spark: SparkSession, edges: DataFrame, n: Int, nParts: Int = 16): GraphHandle = {
    val base = Csr.buildDistributed(spark, edges, n, nParts).persist(StorageLevel.MEMORY_ONLY)
    val maxDeg = base.map { g =>
      var mx = 0; var i = 0
      while (i < g.nOwned) { val d = g.degreeLocal(i); if (d > mx) mx = d; i += 1 }
      mx
    }.fold(0)(math.max)
    GraphHandle(base, n, maxDeg, nParts)
  }

  /** Driver-side split of an already-canonical LocalGraph (used by tests and
    * benches to skip the DataFrame round-trip when the graph is in hand).
    */
  def prepareLocal(spark: SparkSession, g: LocalGraph, nParts: Int = 16): GraphHandle = {
    val parts = Csr.buildLocal(g, nParts)
    // One PartitionGraph per Spark partition; message routing keys on g.pid,
    // so index alignment is convenient but not required.
    val base = spark.sparkContext
      .parallelize(parts.toIndexedSeq, nParts)
      .persist(StorageLevel.MEMORY_ONLY)
    GraphHandle(base, g.n, g.maxDegree, nParts)
  }

  /** Run one configuration; returns per-vertex coreness plus run metrics. */
  def run(handle: GraphHandle, cfg: KCoreConfig): (Array[Int], RunMetrics) =
    PeelEngine.run(handle.base, handle.n, handle.maxDeg, cfg.copy(nParts = handle.nParts))

  /** DataFrame-in / DataFrame-out surface: takes a (possibly raw) edge list,
    * canonicalizes it through Catalyst, runs the decomposition, and returns
    * a (vertex, coreness) DataFrame.
    */
  def runDF(spark: SparkSession, rawEdges: DataFrame, n: Int, cfg: KCoreConfig): (DataFrame, RunMetrics) = {
    val edges = GraphOps.symmetrize(rawEdges)
    val handle = prepare(spark, edges, n, cfg.nParts)
    try {
      val (core, metrics) = run(handle, cfg)
      import spark.implicits._
      val df = spark.sparkContext
        .parallelize(core.indices.map(v => (v, core(v))), math.min(16, math.max(1, core.length / 10000 + 1)))
        .toDF("vertex", "coreness")
      (df, metrics)
    } finally handle.unpersist()
  }
}
