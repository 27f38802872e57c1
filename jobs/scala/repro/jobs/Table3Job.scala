package repro.jobs

import repro.graph.GraphSuite
import repro.harness.{Table3Harness, TableFormat}

/** Reproduces Table 3 (all 8 combinations of VGC / sampling / HBS).
  *
  * Usage: spark-submit ... repro.jobs.Table3Job [graph names…]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkJob.session("table3")
    val names = if (args.nonEmpty) args.toSeq else GraphSuite.all.map(_.name)
    val rows = Table3Harness.run(spark, names)
    val report = Table3Harness.render(rows)
    println(report)
    val f = TableFormat.writeResult("table3.txt", report)
    println(s"written: $f")
    require(rows.forall(_.comboRuns.forall(_._2.correct)), "some run produced wrong coreness")
    spark.stop()
  }
}
