package repro.fd

import org.scalatest.funsuite.AnyFunSuite
import repro.fd.{AttrSet => AS}

class LazyValidatorSpec extends AnyFunSuite {

  private def table = EncodedTable.fromRows(
    Seq(Seq[Any]("x", 1), Seq[Any]("x", 1), Seq[Any]("y", 2)), IndexedSeq(0, 1))

  test("does not build the underlying validator until a check runs") {
    var built = false
    val v = new LazyValidator(() => { built = true; new DriverValidator(table) })
    assert(!built && !v.materialized)
    assert(v.holds(AS.of(0), 1))
    assert(built && v.materialized)
  }

  test("builds only once across checks") {
    var builds = 0
    val v = new LazyValidator(() => { builds += 1; new DriverValidator(table) })
    v.holds(AS.of(0), 1); v.cardinality(AS.of(1)); v.isKey(AS.of(0, 1))
    assert(builds == 1)
  }

  test("delegates all checks faithfully") {
    val v = new LazyValidator(() => new DriverValidator(table))
    val d = new DriverValidator(table)
    assert(v.nRows == d.nRows)
    AS.allSubsets(AS.universe(2)).foreach { s =>
      assert(v.cardinality(s) == d.cardinality(s))
    }
    assert(v.holds(AS.of(0), 1) == d.holds(AS.of(0), 1))
    assert(v.holds(AS.of(1), 0) == d.holds(AS.of(1), 0))
  }
}
