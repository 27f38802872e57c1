package repro.jobs

import repro.core.{KCoreConfig, ParallelKCore}
import repro.graph.{GraphOps, GraphSuite}
import repro.model.CostModel

/** Single-run entrypoint: one suite graph × one algorithm.
  *
  * Usage: spark-submit ... repro.jobs.KCoreJob <graph> [ours|plain|julienne|park|pkc]
  */
object KCoreJob {
  def main(args: Array[String]): Unit = {
    require(args.nonEmpty, "usage: KCoreJob <graph> [algo]")
    val spark = SparkJob.session("kcore")
    val spec = GraphSuite.byName(args(0))
    val cfg = args.lift(1).getOrElse("ours").toLowerCase match {
      case "ours" => KCoreConfig.ours
      case "plain" => KCoreConfig.plain
      case "julienne" => KCoreConfig.julienne
      case "park" => KCoreConfig.park
      case "pkc" => KCoreConfig.pkc
      case other => sys.error(s"unknown algo $other")
    }
    val g = spec.build()
    // Exercise the full DataFrame surface end to end.
    val edges = GraphOps.toDF(spark, g)
    val (coreDf, metrics) = ParallelKCore.runDF(spark, edges, g.n, cfg)
    val dist = coreDf.groupBy("coreness").count().orderBy("coreness").collect()
    println(s"graph=${spec.name} n=${g.n} m=${g.m} algo=${cfg.name}")
    println(f"wall=${metrics.wallMillis / 1000}%.3fs subrounds=${metrics.subrounds} " +
      f"rho'=${metrics.subroundsNonEmpty} work=${metrics.work} " +
      f"modeled96=${CostModel.tpSeconds(metrics)}%.4fs")
    println("coreness distribution (coreness -> count):")
    dist.foreach(r => println(s"  ${r.get(0)} -> ${r.get(1)}"))
    spark.stop()
  }
}
