package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** DataFrame surface of the graph substrate.
  *
  * The canonical graph lives in [[LocalGraph]]; these helpers expose it to
  * Spark SQL and implement the symmetrize/dedup pipeline as Catalyst
  * operations so they can be Oracle-checked against DuckDB.
  */
object GraphOps {

  /** The canonical CSR as an edge DataFrame with both directions present. */
  def toDF(spark: SparkSession, g: LocalGraph): DataFrame = {
    val rows = new Array[(Int, Int)](g.adj.length)
    var v = 0
    var i = 0
    while (v < g.n) {
      val end = g.indptr(v + 1)
      while (i < end) { rows(i) = (v, g.adj(i)); i += 1 }
      v += 1
    }
    import spark.implicits._
    spark.sparkContext.parallelize(rows.toIndexedSeq, math.min(64, math.max(1, rows.length / 20000 + 1)))
      .toDF("src", "dst")
  }

  /** Raw directed pairs as a DataFrame (pre-canonicalization). */
  def rawToDF(spark: SparkSession, srcs: Array[Int], dsts: Array[Int]): DataFrame = {
    import spark.implicits._
    spark.sparkContext.parallelize(srcs.indices.map(i => (srcs(i), dsts(i))), 16)
      .toDF("src", "dst")
  }

  /** Symmetrize + drop self-loops + dedup, entirely in Catalyst.
    * Produces the same edge set as [[LocalGraph.fromPairs]].
    */
  def symmetrize(edges: DataFrame): DataFrame = {
    val fwd = edges.select(col("src"), col("dst"))
    val rev = edges.select(col("dst").as("src"), col("src").as("dst"))
    fwd.union(rev).where(col("src") =!= col("dst")).distinct()
  }

  /** Per-vertex degree of a symmetric edge DataFrame. Vertices with no edges
    * are absent (join with a vertex table if zeros are needed).
    */
  def degrees(edges: DataFrame): DataFrame =
    edges.groupBy(col("src").as("vertex")).agg(count(lit(1)).cast("int").as("degree"))

  /** Number of undirected edges in a symmetric edge DataFrame. */
  def undirectedEdgeCount(edges: DataFrame): Long = edges.count() / 2
}
