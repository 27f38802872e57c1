package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.graph.GraphOps
import repro.seq.SeqKCore

class KCoreSubgraphSpec extends SparkSpec {

  private lazy val g = TestGraphs.random(250, 1400, 21)
  private lazy val gdf = GraphOps.toDF(spark, g).cache()
  private lazy val core = SeqKCore.bz(g)

  test("max k-core matches the sequential peeler for several k") {
    Seq(1, 2, 3, 5).foreach { k =>
      val got = KCoreSubgraph.maxKCoreVertices(spark, gdf, k)
        .collect().map(_.getInt(0)).sorted.toSeq
      val expected = SeqKCore.maxKCoreVertices(g, k).toSeq
      assert(got == expected, s"k=$k")
    }
  }

  test("max k-core equals {v : coreness(v) >= k}") {
    val k = 3
    val got = KCoreSubgraph.maxKCoreVertices(spark, gdf, k)
      .collect().map(_.getInt(0)).toSet
    assert(got == (0 until g.n).filter(core(_) >= k).toSet)
  }

  test("k above kmax yields the empty core") {
    assert(KCoreSubgraph.maxKCoreVertices(spark, gdf, core.max + 1).isEmpty)
  }

  test("k-core of a clique is all-or-nothing") {
    val cdf = GraphOps.toDF(spark, TestGraphs.clique(8)).cache()
    assert(KCoreSubgraph.maxKCoreVertices(spark, cdf, 7).count() == 8)
    assert(KCoreSubgraph.maxKCoreVertices(spark, cdf, 8).count() == 0)
  }

  test("surviving-vertex count agrees with DuckDB over the coreness table") {
    import spark.implicits._
    val k = 4
    val coreDf = spark.sparkContext
      .parallelize(core.indices.map(v => (v, core(v))), 4).toDF("vertex", "coreness")
    val got = KCoreSubgraph.maxKCoreVertices(spark, gdf, k)
    Oracle.assertEquivalent(
      got,
      s"SELECT vertex FROM core WHERE CAST(coreness AS INT) >= $k",
      "core" -> coreDf)
  }
}
