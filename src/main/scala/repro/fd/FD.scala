package repro.fd

import repro.fd.{AttrSet => AS}

/** A canonical functional dependency: `lhs → rhs` with a single RHS attribute.
  *
  * Attribute indices are *global* indices assigned by the enclosing view
  * context (see `repro.views.ViewSchema`), so an FD mined on a base table and
  * an FD holding on the view compare positionally.
  */
final case class FD(lhs: AS.T, rhs: Int) {
  require(!AS.contains(lhs, rhs), s"non-canonical FD: rhs $rhs inside lhs")

  def attrs: AS.T = AS.add(lhs, rhs)

  /** `this` is at least as general as `other` (same rhs, lhs ⊆ other.lhs). */
  def generalizes(other: FD): Boolean =
    rhs == other.rhs && AS.subsetOf(lhs, other.lhs)

  def render(names: Int => String): String =
    s"${AS.toSeq(lhs).map(names).mkString(",")} -> ${names(rhs)}"

  override def toString: String = render(_.toString)
}

/** Operations over sets of canonical FDs: closure, implication, minimal
  * cover, and logical equivalence — the machinery behind InFine's inference
  * step and behind the completeness tests that compare InFine's output with
  * a direct mining run on the materialized view.
  */
object FDSet {

  /** Attribute-set closure of `x` under `fds` (naive fixpoint; FD sets in
    * this workload are at most a few thousand entries).
    */
  def closure(x: AS.T, fds: Iterable[FD]): AS.T = {
    var cl      = x
    var changed = true
    while (changed) {
      changed = false
      val it = fds.iterator
      while (it.hasNext) {
        val d = it.next()
        if (!AS.contains(cl, d.rhs) && AS.subsetOf(d.lhs, cl)) {
          cl = AS.add(cl, d.rhs)
          changed = true
        }
      }
    }
    cl
  }

  /** Does `fds` logically imply `d`? */
  def implies(fds: Iterable[FD], d: FD): Boolean =
    AS.contains(closure(d.lhs, fds), d.rhs)

  /** Two FD sets are logically equivalent iff each implies every FD of the
    * other. This is the comparison used by the paper's Theorem 5
    * (completeness modulo equivalence).
    */
  def equivalent(a: Iterable[FD], b: Iterable[FD]): Boolean =
    a.forall(implies(b, _)) && b.forall(implies(a, _))

  /** FDs of `b` not implied by `a` — diagnostic helper for tests. */
  def notImplied(a: Iterable[FD], b: Iterable[FD]): Seq[FD] =
    b.filterNot(implies(a, _)).toSeq

  /** Keep only minimal FDs: drop any FD whose lhs strictly contains the lhs
    * of another FD with the same rhs (and dedupe).
    */
  def minimize(fds: Iterable[FD]): Set[FD] = {
    val byRhs = fds.toSet[FD].groupBy(_.rhs)
    byRhs.values.flatMap { ds =>
      ds.filter(d => !ds.exists(o => o != d && o.generalizes(d)))
    }.toSet
  }

  /** Is `d` minimal and novel w.r.t. `known`: not implied by `known` via a
    * generalization with the same rhs? (Weaker than full implication — used
    * for lattice pruning where only same-rhs subsumption is sound.)
    */
  def subsumedBy(known: Iterable[FD], d: FD): Boolean =
    known.exists(_.generalizes(d))
}
