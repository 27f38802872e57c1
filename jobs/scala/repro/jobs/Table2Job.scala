package repro.jobs

import repro.graph.GraphSuite
import repro.harness.{Table2Harness, TableFormat}

/** Reproduces Table 2 (overall performance: ours vs BZ/Julienne/ParK/PKC).
  *
  * Usage: spark-submit ... repro.jobs.Table2Job [graph names…]
  * With no arguments the full 25-graph suite runs.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkJob.session("table2")
    val names = if (args.nonEmpty) args.toSeq else GraphSuite.all.map(_.name)
    val rows = Table2Harness.run(spark, names)
    val report = Table2Harness.render(rows)
    println(report)
    val f = TableFormat.writeResult("table2.txt", report)
    println(s"written: $f")
    require(rows.forall(_.runs.forall(_._2.correct)), "some run produced wrong coreness")
    spark.stop()
  }
}
