package repro.core

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.fd.{AttrSet => AS, _}
import repro.views._

/** Per-stage wall-clock accounting mirroring the paper's Table III /
  * Figure 5 breakdown. Semijoin materialization counts into upstageFDs;
  * partial-join checks into their owning stage (refine → inferFDs,
  * candidate validation → mineFDs), exactly as the paper attributes the
  * partial SPJ computation to mineFDs.
  */
final class InFineStats {
  val nanos = mutable.Map.empty[String, Long].withDefaultValue(0L)
  def time[T](stage: String)(f: => T): T = {
    val t0 = System.nanoTime()
    try f finally nanos(stage) += System.nanoTime() - t0
  }
  def seconds(stage: String): Double = nanos(stage) / 1e9
}

/** Result of the InFine pipeline on one view. */
final case class InFineResult(
    schema: ViewSchema,
    triples: Set[ProvenanceTriple],
    stats: InFineStats,
) {
  def fds: Set[FD] = triples.map(_.fd)
  def countByType: Map[FDType, Int] =
    FDType.all.map(t => t -> triples.count(_.fdType == t)).toMap
  def render: Seq[String] = triples.toSeq
    .sortBy(t => (t.fdType.label, AS.size(t.fd.lhs), t.fd.rhs))
    .map(_.render(schema))
}

/** Intermediate result of `provFDs` on a sub-view: its evaluated instance,
  * its projected global attributes, and the provenance triples of every
  * minimal FD holding on it.
  */
final case class NodeResult(spec: ViewSpec, df: DataFrame, attrs: AS.T,
                            triples: Set[ProvenanceTriple]) {
  def fds: Set[FD] = triples.map(_.fd)
  lazy val count: Long = df.count()
}

/** InFine — Algorithm 1. Mines base-table FDs restricted to the view's
  * projected attributes, then recursively derives the FDs (with provenance)
  * of every sub-view without ever materializing the full view for mining.
  */
object InFine {

  final class Context(
      val schema: ViewSchema,
      val eval: ViewEval,
      /** A_V — the view's projected attributes (paper line #2). */
      val minedAttrs: AS.T,
      val stats: InFineStats,
      val deadline: Deadline,
      val baseMiner: Miner,
  ) {
    /** Validator over `df` restricted to `universe` (columns `a<idx>`).
      * Lazy: the instance is only counted/collected when a candidate check
      * actually needs data, so purely-logical stages cost no Spark job.
      */
    def validatorFor(df: DataFrame, universe: AS.T): FDValidator = {
      val ids = AS.toSeq(universe)
      new LazyValidator(() =>
        Validator.forDataFrame(df.select(ids.map(i => col(s"a$i")): _*), ids))
    }
  }

  def run(spec: ViewSpec, catalog: Map[String, DataFrame],
          baseMiner: Miner = Tane,
          deadline: Deadline = Deadline.never): InFineResult = {
    val schema = ViewSchema.of(spec, t => catalog(t).columns.toSeq)
    val eval   = new ViewEval(schema, catalog)
    val stats  = new InFineStats
    val aV     = schema.idsOf(spec)
    val ctx    = new Context(schema, eval, aV, stats, deadline, baseMiner)

    // Step 1 (lines #3–5): FDs of each base-relation instance, limited to
    // the attributes surviving the view's projections.
    val baseFds = mutable.Map.empty[String, Set[FD]]
    spec.rels.foreach { r =>
      val mineable = AS.intersect(schema.attrsOf(r.alias), aV)
      baseFds(r.alias) = stats.time("base") {
        if (AS.isEmpty(mineable)) Set.empty
        else {
          val df  = eval.relDf(r).select(AS.toSeq(mineable).map(i => col(s"a$i")): _*)
          val tbl = EncodedTable.fromDataFrame(df, AS.toSeq(mineable))
          baseMiner.mine(tbl, deadline)
        }
      }
    }

    val root = provFDs(ctx, spec, baseFds.toMap)
    InFineResult(schema, root.triples, stats)
  }

  /** The recursive subroutine of Algorithm 1. */
  def provFDs(ctx: Context, spec: ViewSpec, baseFds: Map[String, Set[FD]]): NodeResult =
    spec match {
      case r: Rel =>
        val df = ctx.eval.relDf(r)
        val triples = baseFds(r.alias).map(d => ProvenanceTriple(d, FDType.Base, r))
        NodeResult(r, df, ctx.schema.attrsOf(r.alias), triples)

      case p @ Project(attrs, in) =>
        // Mining was restricted to A_V up-front (Section IV-A): recursion
        // only narrows the instance; FDs over dropped attributes were never
        // mined, and Theorem 1 says no new FDs can appear.
        val child = provFDs(ctx, in, baseFds)
        val keep  = AS.fromIterable(attrs.map(ctx.schema.id))
        val triples = child.triples.filter(t => AS.subsetOf(t.fd.attrs, keep))
        NodeResult(p, ctx.eval.eval(p), keep, triples)

      case s @ Select(_, in) =>
        val child = provFDs(ctx, in, baseFds)
        val df    = ctx.eval.eval(s).cache()
        val up    = ctx.stats.time("selection") {
          SelectionFDs(ctx, child, df)
        }
        val triples = merge(child.triples,
          up.map(d => ProvenanceTriple(d, FDType.UpstagedSelection, s)))
        NodeResult(s, df, child.attrs, triples)

      case j @ Join(l, r, on, kind) =>
        val lRes = provFDs(ctx, l, baseFds)
        val rRes = provFDs(ctx, r, baseFds)
        joinNode(ctx, j, lRes, rRes, on, kind)
    }

  private def joinNode(ctx: Context, j: Join, lRes: NodeResult, rRes: NodeResult,
                       on: Seq[(AttrRef, AttrRef)], kind: JoinKind): NodeResult = {
    val schema = ctx.schema
    // Cached, but lazy: nothing is computed until a stage actually touches
    // the joined instance (upstage size checks touch only semijoins).
    val df     = ctx.eval.eval(j).cache()
    val lKeys  = on.map { case (a, _) => schema.id(a) }
    val rKeys  = on.map { case (_, b) => schema.id(b) }

    kind match {
      case JoinKind.LeftSemi | JoinKind.RightSemi =>
        // A semijoin is a selection of one side (Definition 3: proj keeps
        // that side only) — upstaged FDs mined exactly like Algorithm 2.
        val side  = if (kind == JoinKind.LeftSemi) lRes else rRes
        val tpe   = if (kind == JoinKind.LeftSemi) FDType.UpstagedLeft else FDType.UpstagedRight
        val up = ctx.stats.time("upstaged") {
          val universe = AS.intersect(side.attrs, ctx.minedAttrs)
          if (df.count() < side.count && !AS.isEmpty(universe))
            LatticeSearch.mineNew(universe, ctx.validatorFor(df, universe),
              side.fds, ctx.deadline)
          else Set.empty[FD]
        }
        NodeResult(j, df, side.attrs,
          merge(side.triples, up.map(d => ProvenanceTriple(d, tpe, j))))

      case JoinKind.Inner =>
        val attrs = AS.union(lRes.attrs, rRes.attrs)
        // One lazily-materialized validator serves every stage of this join
        // node; if logical pruning leaves nothing to check, the joined
        // instance is never computed at all.
        val joinValidator = ctx.validatorFor(df, AS.intersect(attrs, ctx.minedAttrs))

        // Algorithm 3 — upstaged left/right via semijoin size checks.
        val (leftUp, rightUp) = ctx.stats.time("upstaged") {
          (JoinUpFDs.side(ctx, lRes, rRes, lKeys, rKeys, joinValidator),
           JoinUpFDs.side(ctx, rRes, lRes, rKeys, lKeys, joinValidator))
        }
        val leftKnown  = lRes.fds ++ leftUp
        val rightKnown = rRes.fds ++ rightUp

        // Join-predicate equalities: x_i ↔ y_i hold on every inner equi-join
        // result; they are Armstrong-derivable from the join condition, so
        // they carry "inferred" provenance.
        val equalities = on.flatMap { case (a, b) =>
          val (x, y) = (schema.id(a), schema.id(b))
          if (AS.contains(ctx.minedAttrs, x) && AS.contains(ctx.minedAttrs, y))
            Seq(FD(AS.single(x), y), FD(AS.single(y), x))
          else Seq.empty
        }.toSet

        val knownAfterUp = leftKnown ++ rightKnown ++ equalities

        // Algorithm 4 — inferred FDs (transitivity through join attributes,
        // refined on partial joins).
        val inferred = ctx.stats.time("inferred") {
          InferFDs(ctx, joinValidator, leftKnown, rightKnown,
            lKeys, rKeys, lRes.attrs, rRes.attrs, knownAfterUp)
        }

        // Algorithm 5 — remaining join FDs via selective mining.
        val knownAfterInf = knownAfterUp ++ inferred
        val joinFds = ctx.stats.time("mine") {
          MineFDs(ctx, joinValidator, knownAfterInf,
            lKeys, rKeys, lRes.attrs, rRes.attrs, leftKnown, rightKnown)
        }

        val newTriples =
          leftUp.map(d => ProvenanceTriple(d, FDType.UpstagedLeft, j)) ++
          rightUp.map(d => ProvenanceTriple(d, FDType.UpstagedRight, j)) ++
          (equalities ++ inferred).map(d => ProvenanceTriple(d, FDType.Inferred, j)) ++
          joinFds.map(d => ProvenanceTriple(d, FDType.JoinFD, j))
        NodeResult(j, df, attrs, merge(lRes.triples ++ rRes.triples, newTriples))

      case _ =>
        // Outer joins: null padding can re-type or invalidate categories in
        // ways Theorem 1 does not cover under null==null semantics, so we
        // fall back to a direct pruned mining of the sub-view and classify
        // against the children (none of the paper's 16 experimental views
        // uses an outer join).
        val attrs    = AS.union(lRes.attrs, rRes.attrs)
        val universe = AS.intersect(attrs, ctx.minedAttrs)
        val mined = ctx.stats.time("mine") {
          LatticeSearch.mineNew(universe, ctx.validatorFor(df, universe),
            Set.empty[FD], ctx.deadline)
        }
        val childByFd = (lRes.triples ++ rRes.triples).map(t => t.fd -> t).toMap
        val triples = mined.map { d =>
          childByFd.get(d).getOrElse {
            val tpe =
              if (AS.subsetOf(d.attrs, lRes.attrs)) FDType.UpstagedLeft
              else if (AS.subsetOf(d.attrs, rRes.attrs)) FDType.UpstagedRight
              else if (FDSet.implies(lRes.fds ++ rRes.fds, d)) FDType.Inferred
              else FDType.JoinFD
            ProvenanceTriple(d, tpe, j)
          }
        }
        NodeResult(j, df, attrs, triples)
    }
  }

  /** Combine existing triples with newly discovered ones, then drop any FD
    * made non-minimal by a strictly more general newcomer (a base FD can
    * stop being minimal once the join upstages a generalization of it); on
    * duplicates, the earliest (sub-query-order) triple wins, per the
    * "first sub-query in which d holds" clause of Definition 8.
    */
  def merge(existing: Set[ProvenanceTriple],
            fresh: Iterable[ProvenanceTriple]): Set[ProvenanceTriple] = {
    val freshKept = fresh.filterNot(t => existing.exists(_.fd == t.fd))
    val all  = existing ++ freshKept
    val fds  = all.map(_.fd)
    all.filter(t => !fds.exists(o => o != t.fd && o.generalizes(t.fd)))
  }
}
