package repro.bench

import repro.SparkSpec
import repro.graph.GraphSuite
import repro.harness.{Table2Harness, TableFormat}

/** Benchmark suite reproducing Table 2. Runs the full 25-graph suite through
  * ours / Julienne / ParK / PKC (plus sequential BZ and the sequential
  * framework), prints the paper-style report, writes it to results/, and
  * asserts the correctness plus the main shape claims of the paper.
  */
class Table2Bench extends SparkSpec {

  private lazy val rows = Table2Harness.run(spark, GraphSuite.all.map(_.name))
  private def byName(n: String) = rows.find(_.spec.name == n).get

  test("Table 2: all 100 parallel runs produce exact coreness") {
    assert(rows.size == 25)
    rows.foreach { r =>
      r.runs.foreach { case (a, run) => assert(run.correct, s"${r.spec.name}/$a") }
    }
  }

  test("Table 2: report is rendered and persisted") {
    val report = Table2Harness.render(rows)
    println(report)
    val f = TableFormat.writeResult("table2.txt", report)
    assert(f.exists() && f.length() > 1000)
  }

  // --- shape claims of the paper, on modeled 96-core times ------------------

  private def modeled(g: String, a: String): Double =
    byName(g).runs.toMap.apply(a).modeled.tpSeconds

  test("shape: ours beats or ties ParK on every dense graph (work-efficiency + sampling)") {
    // Model compression at laptop scale can turn a paper-scale win into a
    // near-tie; 5% covers those without accepting a real loss.
    rows.filter(_.spec.dense).foreach { r =>
      assert(modeled(r.spec.name, "Ours") < modeled(r.spec.name, "ParK") * 1.05,
        s"${r.spec.name}: ours=${modeled(r.spec.name, "Ours")} park=${modeled(r.spec.name, "ParK")}")
    }
  }

  test("shape: ours beats Julienne on the high-rho sparse graphs (VGC)") {
    Seq("GRID", "TRCE", "BBL").foreach { g =>
      assert(modeled(g, "Ours") < modeled(g, "Julienne"),
        s"$g: ours=${modeled(g, "Ours")} julienne=${modeled(g, "Julienne")}")
    }
  }

  test("shape: ParK pays O(kmax n) work on HCNS; ours stays near O(n+m)") {
    val r = byName("HCNS")
    val m = r.runs.toMap
    assert(m("ParK").metrics.structOps > 5 * m("Ours").metrics.structOps)
  }

  test("shape: sampling caps contention on the hub-heavy graphs") {
    Seq("TW", "CW", "SD").foreach { g =>
      val m = byName(g).runs.toMap
      assert(m("Ours").metrics.maxContention < m("ParK").metrics.maxContention,
        s"$g: ours=${m("Ours").metrics.maxContention} park=${m("ParK").metrics.maxContention}")
    }
  }

  test("shape: ours wins on a clear majority of graphs (paper: 23 of 25)") {
    // The paper counts ours best on 23/25 with the two losses within 12% of
    // the winner; we count a win as best-or-within-10% (model compression at
    // laptop scale blurs near-ties on the uniform low-degree graphs).
    val wins = rows.count { r =>
      val m = r.runs.toMap
      val ours = m("Ours").modeled.tpSeconds
      Seq("Julienne", "ParK", "PKC").forall(a => ours <= m(a).modeled.tpSeconds * 1.10)
    }
    assert(wins >= 15, s"ours wins only $wins of 25")
  }

  test("shape: engine rho' with VGC is far below the offline rho on sparse graphs") {
    Seq("GRID", "TRCE", "BBL", "CUBE").foreach { g =>
      val r = byName(g)
      val ours = r.runs.toMap.apply("Ours").metrics
      assert(ours.subroundsNonEmpty * 2 < r.rho,
        s"$g: rho'=${ours.subroundsNonEmpty} rho=${r.rho}")
    }
  }

  test("stats: kmax of the road/knn/mesh analogues stays in the paper's regime") {
    assert(byName("GRID").kmax == 2)
    assert(byName("CUBE").kmax == 3)
    Seq("AF", "NA", "AS", "EU").foreach(g => assert((3 to 4).contains(byName(g).kmax), g))
    Seq("TRCE", "BBL").foreach(g => assert(byName(g).kmax == 2, g))
    // The dense random block collapses to a sharp core near its expected
    // degree (~560) — the high-coreness regime (measured kmax = 481).
    assert(byName("HCNS").kmax > 400)
  }
}
