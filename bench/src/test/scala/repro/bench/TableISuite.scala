package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Workloads

/** Reproduces paper Table I (data characteristics): per base table the
  * attribute count, tuple count and number of minimal FDs, on the synthetic
  * stand-in datasets at bench scale. Shapes (which tables are FD-rich,
  * which are trivial) should mirror the paper even though absolute FD
  * counts differ on synthetic data.
  */
class TableISuite extends AnyFunSuite {

  lazy val rows = Tables.tableI()

  test("all 20 base tables are profiled") {
    assert(rows.size == Workloads.tablesByDb.map(_._2.size).sum)
    assert(rows.map(r => (r.db, r.table)).distinct.size == rows.size)
  }

  test("every table has at least one attribute and row counts match SF") {
    rows.foreach { r =>
      assert(r.atts > 0, r.table)
      assert(r.tuples > 0, r.table)
    }
  }

  test("FD-rich vs FD-poor shape matches the paper") {
    val byTable = rows.map(r => r.table -> r).toMap
    // admissions is the FD-richest MIMIC table in the paper (631 FDs).
    val mimic = rows.filter(_.db == "MIMIC3")
    assert(byTable("admissions").fds == mimic.map(_.fds).max)
    // nation/region carry bijective name↔key FDs.
    assert(byTable("nation").fds >= 2)
    assert(byTable("region").fds >= 2)
    // drug is a single-attribute table: no FDs (paper: 0).
    assert(byTable("drug").fds == 0)
    // connected carries structural FDs from the bond graph (paper: 3).
    assert(byTable("connected").fds >= 2)
  }

  test("key tables have at least (atts - 1) FDs from the key") {
    val byTable = rows.map(r => r.table -> r).toMap
    Seq("admissions", "d_icd_diagnoses", "molecule", "supplier", "orders")
      .foreach { t =>
        val r = byTable(t)
        assert(r.fds >= r.atts - 1, s"$t: ${r.fds} FDs for ${r.atts} atts")
      }
  }
}
