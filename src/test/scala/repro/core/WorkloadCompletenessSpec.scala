package repro.core

import org.apache.spark.sql.functions.col
import repro.SparkSpec
import repro.data.Workloads
import repro.fd.{AttrSet => AS, _}
import repro.views._

/** The reproduction's central invariant (paper Theorems 5–6): on every one
  * of the 16 experimental SPJ views, InFine's provenance-annotated FD set is
  * exactly the set of minimal FDs a direct miner reports on the materialized
  * view — at unit-test scale factors.
  */
class WorkloadCompletenessSpec extends SparkSpec {

  private val sfOf = Map("MIMIC3" -> 0.002, "PTE" -> 0.02, "PTC" -> 0.02, "TPC-H" -> 0.001)

  private def directFds(spec: ViewSpec, catalog: Map[String, org.apache.spark.sql.DataFrame]): Set[FD] = {
    val schema = ViewSchema.of(spec, t => catalog(t).columns.toSeq)
    val eval   = new ViewEval(schema, catalog)
    val ids    = AS.toSeq(schema.idsOf(spec))
    val d      = eval.eval(spec).select(ids.map(i => col(s"a$i")): _*)
    Tane.mine(EncodedTable.fromDataFrame(d, ids))
  }

  Workloads.all.foreach { w =>
    test(s"${w.db}: ${w.name} — InFine == direct mining on the view") {
      val catalog = Workloads.catalog(w.db, spark, sfOf(w.db))
        .map { case (k, df) => k -> df.cache() }
      val res    = InFine.run(w.spec, catalog)
      val direct = directFds(w.spec, catalog)
      assert(res.fds == direct,
        s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
        s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
      // sanity: provenance covers every FD exactly once
      assert(res.triples.toSeq.map(_.fd).distinct.size == res.triples.size)
      catalog.values.foreach(_.unpersist())
    }
  }
}
