package repro.core

import org.apache.spark.sql.DataFrame
import repro.fd.{AttrSet => AS, _}
import repro.views._

/** The "straightforward" comparison pipeline of the paper's experiments:
  * materialize the full SPJ view, run a classical single-table FD miner on
  * the result, and (to match InFine's provenance output) diff the mined FDs
  * against the base-table FDs to recover each FD's lineage.
  */
object Straightforward {

  final case class Result(
      schema: ViewSchema,
      fds: Set[FD],
      triples: Set[ProvenanceTriple],
      viewSeconds: Double,
      mineSeconds: Double,
      diffSeconds: Double,
      viewRows: Long,
  ) {
    def totalSeconds: Double = viewSeconds + mineSeconds + diffSeconds
  }

  def run(spec: ViewSpec, catalog: Map[String, DataFrame],
          miner: Miner, deadline: Deadline = Deadline.never): Result = {
    val schema = ViewSchema.of(spec, t => catalog(t).columns.toSeq)
    val eval   = new ViewEval(schema, catalog)

    // 1. Full SPJ view computation (the cost InFine avoids).
    val t0   = System.nanoTime()
    val df   = eval.eval(spec).cache()
    val rows = df.count()
    val tView = (System.nanoTime() - t0) / 1e9

    // 2. Classical FD discovery over the materialized result.
    val aV  = schema.idsOf(spec)
    val ids = AS.toSeq(aV)
    val t1  = System.nanoTime()
    val tbl = EncodedTable.fromDataFrame(
      df.select(ids.map(i => org.apache.spark.sql.functions.col(s"a$i")): _*), ids)
    val fds = miner.mine(tbl, deadline)
    val tMine = (System.nanoTime() - t1) / 1e9

    // 3. Provenance recovery: compare with the base-table FD sets (mined
    // separately — that cost is excluded on both sides, as in the paper).
    val t2 = System.nanoTime()
    val baseFds = spec.rels.flatMap { r =>
      val mineable = AS.intersect(schema.attrsOf(r.alias), aV)
      if (AS.isEmpty(mineable)) Set.empty[FD]
      else {
        val bdf  = eval.relDf(r).select(AS.toSeq(mineable).map(i =>
          org.apache.spark.sql.functions.col(s"a$i")): _*)
        miner.mine(EncodedTable.fromDataFrame(bdf, AS.toSeq(mineable)), deadline)
      }
    }.toSet
    val sideAttrs = spec.rels.map(r => schema.attrsOf(r.alias))
    val triples = fds.map { d =>
      val tpe =
        if (baseFds.contains(d)) FDType.Base
        else if (sideAttrs.exists(s => AS.subsetOf(d.attrs, s)))
          FDType.UpstagedLeft // single-table FD not valid on the base table
        else if (FDSet.implies(baseFds, d)) FDType.Inferred
        else FDType.JoinFD
      ProvenanceTriple(d, tpe, spec)
    }
    val tDiff = (System.nanoTime() - t2) / 1e9

    df.unpersist()
    Result(schema, fds, triples, tView, tMine, tDiff, rows)
  }
}
