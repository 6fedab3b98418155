package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Figure 3 as a table: total FD-discovery runtime of InFine
  * (no full-view mining) against the straightforward approach (full SPJ
  * view computation + classical miner), per view and per baseline.
  *
  * What transfers from the paper at reduced scale (and is asserted here):
  * the tuple-quadratic baseline (FastFDs) is the slowest method and loses
  * to InFine by a wide aggregate margin — the paper's ">2,000 s" shape.
  * The paper's 1–2 order gap over *all* baselines depends on view
  * materialization/mining dominating (SF 1, up to 3.7M-row views,
  * DB-backed); at our scale collecting a ≤60k-row view is nearly free, so
  * the in-memory attribute-based baselines win small views — the scaling
  * trend toward the paper's regime is covered by `ScalingSuite`.
  */
class RuntimeSuite extends AnyFunSuite {

  lazy val rows = Tables.runtimeTable()

  test("all 16 views are benchmarked") {
    assert(rows.size == 16)
  }

  test("InFine is faster than the slowest baseline on most views") {
    val wins = rows.count { r =>
      val worst = r.baselines.values.map(_._1).max
      r.inFineS < worst
    }
    assert(wins >= rows.size / 2, s"InFine won only $wins/${rows.size}")
  }

  test("aggregate: InFine decisively beats the quadratic baseline (FastFDs)") {
    val inFineTotal  = rows.map(_.inFineS).sum
    val fastFdsTotal = rows.map(_.baselines("FastFDs")._1).sum // timeouts count as the budget: a lower bound
    info(f"totals: InFine ${inFineTotal}%.1f s vs FastFDs ≥ ${fastFdsTotal}%.1f s")
    assert(inFineTotal < fastFdsTotal)
  }

  test("FastFDs is the slowest baseline in aggregate (paper shape)") {
    val totals = Tables.baselineMiners.map { m =>
      m.name -> rows.map(_.baselines(m.name)._1).sum
    }.toMap
    assert(totals("FastFDs") == totals.values.max)
  }

  test("FastFDs hits its budget on the low-coverage large views, as in the paper") {
    val timeouts = rows.count(_.baselines("FastFDs")._2)
    info(s"FastFDs timeouts: $timeouts/16 (paper: >2,000 s on several views)")
    assert(timeouts >= 2)
  }

  test("per-view speedup over the baseline mean is reported") {
    val ratios = rows.map { r =>
      val mean = r.baselines.values.map(_._1).sum / r.baselines.size
      r.view -> mean / math.max(r.inFineS, 1e-4)
    }
    ratios.foreach { case (v, s) => info(f"$v%-45s ${s}%8.2fx") }
    val geo = math.exp(ratios.map(r => math.log(r._2)).sum / ratios.size)
    info(f"geometric mean speedup vs baseline mean: $geo%.2fx " +
      "(paper: 10–100x at full scale; see ScalingSuite for the trend)")
    assert(ratios.nonEmpty)
  }
}
