package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces paper Table III: per view, the coverage value, the share of
  * FDs recovered by each InFine stage (upstage / infer / mine), total FD
  * count, and the time breakdown.
  */
class TableIIISuite extends AnyFunSuite {

  lazy val rows = Tables.tableIII()

  test("all 16 views are reported") {
    assert(rows.size == 16)
  }

  test("stage accuracies sum to 1 for every view") {
    rows.foreach { r =>
      assert(math.abs(r.accUp + r.accInf + r.accMine - 1.0) < 1e-9, r.view)
    }
  }

  test("the upstage stage dominates on average, as in the paper (68% ± 20)") {
    val meanUp = rows.map(_.accUp).sum / rows.size
    assert(meanUp > 0.4, f"mean upstage share $meanUp%.2f")
  }

  test("upstage+infer recover most FDs without the full view (paper: 83%)") {
    val mean = rows.map(r => r.accUp + r.accInf).sum / rows.size
    assert(mean > 0.6, f"mean upstage+infer share $mean%.2f")
  }

  test("coverage values span the paper's qualitative range") {
    assert(rows.exists(_.coverage < 1.0), "some view should drop tuples")
    assert(rows.exists(_.coverage > 1.0), "some view should multiply tuples")
  }

  test("timings are recorded and non-negative") {
    rows.foreach { r =>
      assert(r.ioS >= 0 && r.upstageS >= 0 && r.mineS >= 0, r.view)
    }
  }
}
