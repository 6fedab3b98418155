package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces paper Table II: tuple counts and FD counts of the 16 SPJ
  * views (via InFine — the completeness suite in the root project already
  * proved InFine equals direct view mining).
  */
class TableIISuite extends AnyFunSuite {

  lazy val rows = Tables.tableII()

  test("all 16 views are profiled") {
    assert(rows.size == 16)
  }

  test("every view is non-empty and has at least one FD") {
    rows.foreach { r =>
      assert(r.tuples > 0, r.view)
      assert(r.fds > 0, r.view)
    }
  }

  test("join views multiply or retain tuples in the paper's direction") {
    val byView = rows.map(r => r.view -> r).toMap
    // active ⋈ drug: coverage < 1 in the paper — strictly fewer rows than drugs.
    assert(byView("active ⋈ drug").tuples <= byView("atm ⋈ drug").tuples)
    // the 3-table MIMIC view has at least as many FDs as its 2-table core
    assert(byView("[diagnoses_icd ⋈ patients] ⋈ d_icd_diagnoses").fds >=
           byView("diagnoses_icd ⋈ patients").fds)
  }
}
