package repro.bench

import repro.SparkSpec
import repro.graph.GraphSuite
import repro.harness.{Table3Harness, TableFormat}

/** Benchmark suite reproducing Table 3: the 8 combinations of VGC, sampling
  * and HBS on every suite graph — 200 engine runs — with the paper's
  * normalized heatmap for shape comparison.
  */
class Table3Bench extends SparkSpec {

  private lazy val rows = Table3Harness.run(spark, GraphSuite.all.map(_.name))
  private def byName(n: String) = rows.find(_.spec.name == n).get
  private def modeled(g: String, c: String): Double =
    byName(g).comboRuns.toMap.apply(c).modeled.tpSeconds

  test("Table 3: all 200 combo runs produce exact coreness") {
    assert(rows.size == 25)
    rows.foreach { r =>
      r.comboRuns.foreach { case (c, run) => assert(run.correct, s"${r.spec.name}/$c") }
    }
  }

  test("Table 3: report is rendered and persisted") {
    val report = Table3Harness.render(rows)
    println(report)
    val f = TableFormat.writeResult("table3.txt", report)
    assert(f.exists() && f.length() > 1000)
  }

  test("shape: VGC dominates on sparse high-rho graphs") {
    Seq("GRID", "TRCE", "BBL", "CUBE", "AF", "NA", "AS", "EU").foreach { g =>
      assert(modeled(g, "VGC") < modeled(g, "Plain"), s"$g")
    }
  }

  test("shape: sampling helps the hub-heavy dense graphs") {
    Seq("TW", "CW", "SD").foreach { g =>
      assert(modeled(g, "Sample") < modeled(g, "Plain") * 1.05, s"$g")
    }
  }

  test("shape: the full combination is near-best everywhere (paper Fig. 13)") {
    rows.foreach { r =>
      val ts = Table3Harness.comboNames.map(c => modeled(r.spec.name, c))
      val best = ts.min
      val all = modeled(r.spec.name, "All")
      assert(all <= best * 2.0, s"${r.spec.name}: All=$all best=$best")
    }
  }

  test("shape: VGC shrinks rho' by >2x on the sparse graphs (paper Fig. 7)") {
    Seq("GRID", "TRCE", "BBL", "CUBE").foreach { g =>
      val m = byName(g).comboRuns.toMap
      val plain = m("Plain").metrics.subroundsNonEmpty
      val vgc = m("VGC").metrics.subroundsNonEmpty
      assert(vgc * 2 < plain, s"$g: vgc=$vgc plain=$plain")
    }
  }

  test("shape: sampling engages only on graphs with high-degree vertices") {
    val sampledGraphs = rows.filter(_.comboRuns.toMap.apply("All").metrics.maxSampled > 0)
      .map(_.spec.name).toSet
    // Road / knn / mesh graphs have bounded degree — never sampled.
    Seq("AF", "NA", "AS", "EU", "CH5", "GL2", "GL5", "GL10", "COS5", "GRID", "CUBE",
        "TRCE", "BBL").foreach(g => assert(!sampledGraphs.contains(g), g))
    // The hub-heavy analogues must trigger it.
    Seq("TW", "CW", "SD").foreach(g => assert(sampledGraphs.contains(g), g))
  }
}
