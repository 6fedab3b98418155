package repro.fd

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen
import repro.PropHelper
import repro.fd.{AttrSet => AS}

class LatticeSearchSpec extends AnyFunSuite with PropHelper {

  private def table(rows: Seq[Seq[Any]]): EncodedTable =
    EncodedTable.fromRows(rows,
      IndexedSeq.tabulate(rows.headOption.map(_.size).getOrElse(0))(identity))

  private def fd(lhs: Seq[Int], rhs: Int) = FD(AS.fromIterable(lhs), rhs)

  test("with empty known set, mineNew equals the full minimal FD set") {
    val t = table(Seq(Seq(1, "x", "p"), Seq(2, "x", "q"), Seq(3, "y", "p")))
    val got = LatticeSearch.mineNew(AS.universe(3), new DriverValidator(t), Set.empty[FD])
    assert(got == BruteMiner.mine(t))
  }

  test("known FDs are pruned from the output but not re-derived") {
    val t = table(Seq(Seq(1, "x", "p"), Seq(2, "x", "q"), Seq(3, "y", "p")))
    val all   = BruteMiner.mine(t)
    val known = Set(all.head)
    val got   = LatticeSearch.mineNew(AS.universe(3), new DriverValidator(t), known)
    assert(got == all - all.head)
  }

  test("rhsSpace restricts reported RHS attributes") {
    val t = table(Seq(Seq(1, "x", "p"), Seq(2, "x", "q"), Seq(3, "y", "p")))
    val got = LatticeSearch.mineNew(AS.universe(3), new DriverValidator(t),
      Set.empty[FD], rhsSpace = Some(AS.of(1)))
    assert(got.forall(_.rhs == 1))
    assert(got == BruteMiner.mine(t).filter(_.rhs == 1))
  }

  test("candFilter excludes candidates but keeps exploring supersets") {
    val t = table(Seq(Seq(1, "x", "p"), Seq(2, "x", "q"), Seq(3, "y", "p")))
    // Only allow LHSs of size exactly 2 — singleton-lhs FDs are hidden but
    // their supersets are NOT reported either (they are subsumed only by
    // *reported* FDs, so this checks filter+minimality interplay).
    val got = LatticeSearch.mineNew(AS.universe(3), new DriverValidator(t),
      Set.empty[FD], candFilter = (lhs, _) => AS.size(lhs) == 2)
    got.foreach(d => assert(AS.size(d.lhs) == 2))
    // {1,2} is a key, so {1,2}→0 must be found even though {0}'s FDs were hidden.
    assert(got.contains(fd(Seq(1, 2), 0)))
  }

  test("universe restriction hides attributes entirely") {
    val t = table(Seq(Seq(1, "x", "p"), Seq(2, "x", "q"), Seq(3, "y", "p")))
    val got = LatticeSearch.mineNew(AS.of(0, 1), new DriverValidator(t), Set.empty[FD])
    got.foreach(d => assert(AS.subsetOf(d.attrs, AS.of(0, 1))))
    assert(got == BruteMiner.mine(t.project(AS.of(0, 1))))
  }

  private val genTable: Gen[EncodedTable] = for {
    nCols <- Gen.choose(1, 5)
    nRows <- Gen.choose(0, 12)
    cells <- Gen.listOfN(nRows, Gen.listOfN(nCols, Gen.choose(0, 2)))
  } yield table(cells.map(_.map(_.asInstanceOf[Any])))

  test("property: mineNew(∅ known) == BruteMiner on random tables") {
    forAllN(genTable, 120) { t =>
      val got = LatticeSearch.mineNew(AS.universe(t.width), new DriverValidator(t), Set.empty[FD])
      assert(got == BruteMiner.mine(t))
    }
  }

  test("property: known ∪ mineNew == full set, and outputs are disjoint from known") {
    forAllN(genTable, 120) { t =>
      val all = BruteMiner.mine(t)
      if (all.nonEmpty) {
        // Use a random-ish half of the FDs as "known".
        val known = all.toSeq.sortBy(_.hashCode).take(all.size / 2).toSet
        val got   = LatticeSearch.mineNew(AS.universe(t.width), new DriverValidator(t), known)
        assert((known ++ got) == all,
          s"missing=${all -- known -- got} extra=${got -- all}")
        assert(got.intersect(known).isEmpty)
      }
    }
  }
}
