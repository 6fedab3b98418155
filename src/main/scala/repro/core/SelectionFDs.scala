package repro.core

import repro.fd.{AttrSet => AS, FD, LatticeSearch}

/** Algorithm 2 — upstaged FDs appearing through a selection.
  *
  * Runs only when the selection actually filtered tuples (line #4); the
  * level-wise search is pruned by the FDs already valid on the child
  * sub-view (lines #8–9), and only attributes in A_V are explored (line #7).
  */
object SelectionFDs {
  def apply(ctx: InFine.Context, child: NodeResult,
            selDf: org.apache.spark.sql.DataFrame): Set[FD] = {
    val universe = AS.intersect(child.attrs, ctx.minedAttrs)
    if (AS.isEmpty(universe)) return Set.empty
    val selCount = selDf.count()
    if (selCount >= child.count) return Set.empty // no tuple filtered: no new FD
    LatticeSearch.mineNew(universe, ctx.validatorFor(selDf, universe),
      child.fds, ctx.deadline)
  }
}
