package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.RunMetrics

class CostModelSpec extends AnyFunSuite {

  private def metrics(work: Long, subrounds: Int, spanOps: Long): RunMetrics =
    RunMetrics("x", 0.0, 1, subrounds, subrounds, work, 0, 0, 0, 0, 0, 0, 0, 0, spanOps, 0, 0)

  test("burdened span charges omega per subround") {
    val m = CostModel(metrics(work = 0, subrounds = 10, spanOps = 5))
    assert(m.burdenedSpan == 10 * CostModel.Omega + 5)
  }

  test("work term divides by P") {
    val a = CostModel(metrics(96000, 1, 0), p = 96)
    assert(math.abs(a.tpSeconds - (1000 + CostModel.Omega) * CostModel.unitNanos / 1e9) < 1e-12)
  }

  test("subround-heavy runs are dominated by omega (the Julienne-on-GRID regime)") {
    val few = CostModel(metrics(1000000, 5, 1000))
    val many = CostModel(metrics(1000000, 5000, 1000))
    assert(many.tpSeconds > 100 * few.tpSeconds)
  }

  test("model speedup is bounded by P") {
    val m = CostModel(metrics(10000000, 3, 1000), p = 96)
    assert(m.modelSpeedup <= 96.0 + 1e-9)
  }

  test("more work with same span lowers nothing (monotonicity)") {
    val a = CostModel(metrics(1000, 2, 10))
    val b = CostModel(metrics(100000, 2, 10))
    assert(b.tpSeconds > a.tpSeconds)
  }

  test("t1 equals work in seconds") {
    val m = CostModel(metrics(2000000000L, 1, 0))
    assert(math.abs(m.t1Seconds - 2.0) < 1e-9)
  }
}
