package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.fd.{AttrSet => AS, FD}
import repro.views._

class ProvenanceSpec extends AnyFunSuite {

  private val spec = Join(Rel("l"), Rel("r"),
    Seq((AttrRef("l", "k"), AttrRef("r", "k2"))))

  test("FDType labels match the paper's Definition 8 vocabulary") {
    assert(FDType.all.map(_.label) == Seq(
      "base", "upstaged selection", "upstaged left", "upstaged right",
      "inferred", "joinFD"))
  }

  test("triple renders as (fd, \"type\", subquery)") {
    val schema = ViewSchema.of(spec,
      Map("l" -> Seq("k", "a"), "r" -> Seq("k2", "b")))
    val t = ProvenanceTriple(FD(AS.of(1), 3), FDType.JoinFD, spec)
    val s = t.render(schema)
    assert(s == "(l.a -> r.b, \"joinFD\", (l ⋈[l.k=r.k2] r))")
  }

  test("merge keeps the earlier triple on duplicate FDs") {
    val d  = FD(AS.of(0), 1)
    val t1 = ProvenanceTriple(d, FDType.Base, Rel("l"))
    val t2 = ProvenanceTriple(d, FDType.JoinFD, spec)
    val merged = InFine.merge(Set(t1), Seq(t2))
    assert(merged == Set(t1))
  }

  test("merge drops triples subsumed by a fresh generalization") {
    val specific = ProvenanceTriple(FD(AS.of(0, 2), 1), FDType.Base, Rel("l"))
    val general  = ProvenanceTriple(FD(AS.of(0), 1), FDType.UpstagedLeft, spec)
    val merged = InFine.merge(Set(specific), Seq(general))
    assert(merged == Set(general))
  }

  test("merge keeps incomparable FDs with the same rhs") {
    val a = ProvenanceTriple(FD(AS.of(0), 2), FDType.Base, Rel("l"))
    val b = ProvenanceTriple(FD(AS.of(1), 2), FDType.Base, Rel("r"))
    assert(InFine.merge(Set(a), Seq(b)) == Set(a, b))
  }
}
