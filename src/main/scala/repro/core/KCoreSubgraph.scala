package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Maximum k′-core subgraph extraction (paper Appendix B).
  *
  * Iterative Catalyst peeling: repeatedly drop vertices whose degree in the
  * surviving subgraph is below k, until a fixpoint. Converges in at most
  * diameter-of-peeling iterations; each iteration is one shuffle.
  */
object KCoreSubgraph {

  /** Vertices of the maximum k-core of a canonical symmetric edge DataFrame.
    * Returns a single-column DataFrame `vertex`.
    */
  def maxKCoreVertices(spark: SparkSession, edges: DataFrame, k: Int): DataFrame = {
    var cur = edges.select(col("src"), col("dst")).localCheckpoint(true)
    var done = false
    while (!done) {
      val deg = cur.groupBy(col("src")).agg(count(lit(1)).as("deg"))
      val bad = deg.where(col("deg") < k).select(col("src").as("badv")).cache()
      if (bad.isEmpty) done = true
      else {
        // Eager localCheckpoint truncates the lineage — two joins per
        // iteration would otherwise grow the logical plan until Catalyst
        // analysis dominates (or hangs).
        cur = cur
          .join(bad, col("src") === col("badv"), "left_anti")
          .join(bad.withColumnRenamed("badv", "badd"), col("dst") === col("badd"), "left_anti")
          .localCheckpoint(true)
      }
      bad.unpersist()
    }
    cur.select(col("src").as("vertex")).distinct()
  }
}
