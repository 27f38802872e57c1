package repro.engine

import org.apache.spark.Partitioner
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.LocalGraph

/** One partition's share of the graph: the CSR over its owned contiguous
  * vertex range [lo, hi). Neighbor ids are global.
  */
final case class PartitionGraph(
    pid: Int, nParts: Int, n: Int, lo: Int, hi: Int,
    indptr: Array[Int], adj: Array[Int]) extends Serializable {

  def nOwned: Int = hi - lo
  @inline def owns(v: Int): Boolean = v >= lo && v < hi
  @inline def degreeLocal(i: Int): Int = indptr(i + 1) - indptr(i)

  @inline def foreachNeighborLocal(i: Int)(f: Int => Unit): Unit = {
    var p = indptr(i)
    val end = indptr(i + 1)
    while (p < end) { f(adj(p)); p += 1 }
  }
}

/** Distributed CSR construction and the vertex→partition ownership map. */
object Csr {

  /** lo bound of partition p for n vertices over nParts ranges. */
  @inline def boundOf(p: Int, n: Int, nParts: Int): Int = ((p.toLong * n) / nParts).toInt

  /** Owner partition of vertex v (inverse of the contiguous range split). */
  @inline def ownerOf(v: Int, n: Int, nParts: Int): Int = {
    var p = (((v.toLong + 1) * nParts - 1) / n).toInt
    if (p >= nParts) p = nParts - 1
    // The closed form can be off by one at range borders; nudge.
    while (p > 0 && boundOf(p, n, nParts) > v) p -= 1
    while (p < nParts - 1 && boundOf(p + 1, n, nParts) <= v) p += 1
    p
  }

  final class PidPartitioner(val nParts: Int, val n: Int) extends Partitioner {
    def numPartitions: Int = nParts
    def getPartition(key: Any): Int = ownerOf(key.asInstanceOf[Int], n, nParts)
  }

  /** Build the per-partition CSRs from a canonical symmetric edge DataFrame.
    * Edges are shuffled to the owner of their source; each partition sorts
    * its share and lays out the CSR. The result is cached by the caller.
    */
  def buildDistributed(spark: SparkSession, edges: DataFrame, n: Int, nParts: Int): RDD[PartitionGraph] = {
    val pairs: RDD[(Int, Int)] = edges.select("src", "dst").rdd.map { r =>
      (r.get(0).asInstanceOf[Number].intValue(), r.get(1).asInstanceOf[Number].intValue())
    }
    pairs
      .partitionBy(new PidPartitioner(nParts, n))
      .mapPartitionsWithIndex({ (pid, it) =>
        val packed = new scala.collection.mutable.ArrayBuilder.ofLong
        it.foreach { case (s, d) => packed += (s.toLong << 32) | (d.toLong & 0xffffffffL) }
        val arr = packed.result()
        java.util.Arrays.sort(arr)
        val lo = boundOf(pid, n, nParts)
        val hi = boundOf(pid + 1, n, nParts)
        val indptr = new Array[Int](hi - lo + 1)
        val adj = new Array[Int](arr.length)
        var i = 0
        while (i < arr.length) {
          val s = (arr(i) >>> 32).toInt
          indptr(s - lo + 1) += 1
          adj(i) = arr(i).toInt
          i += 1
        }
        var v = 0
        while (v < hi - lo) { indptr(v + 1) += indptr(v); v += 1 }
        Iterator.single(PartitionGraph(pid, nParts, n, lo, hi, indptr, adj))
      }, preservesPartitioning = true)
  }

  /** Driver-side split of a LocalGraph — used by tests to verify the
    * distributed build, and by the engine's local fallback.
    */
  def buildLocal(g: LocalGraph, nParts: Int): Array[PartitionGraph] = {
    Array.tabulate(nParts) { pid =>
      val lo = boundOf(pid, g.n, nParts)
      val hi = boundOf(pid + 1, g.n, nParts)
      val indptr = new Array[Int](hi - lo + 1)
      var v = lo
      while (v < hi) { indptr(v - lo + 1) = indptr(v - lo) + g.degree(v); v += 1 }
      val adj = new Array[Int](indptr(hi - lo))
      v = lo
      while (v < hi) {
        System.arraycopy(g.adj, g.indptr(v), adj, indptr(v - lo), g.degree(v))
        v += 1
      }
      PartitionGraph(pid, nParts, g.n, lo, hi, indptr, adj)
    }
  }
}
