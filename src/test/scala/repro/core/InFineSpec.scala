package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.fd.{AttrSet => AS, _}
import repro.views._

/** End-to-end InFine tests on a crafted analog of the paper's Figure 1
  * running example: base FDs survive the join, an approximate FD upstages
  * to exact (patient #257 scenario), transitivity through the join key
  * yields inferred FDs, and the full output equals a direct mining run on
  * the materialized view.
  */
class InFineSpec extends SparkSpec {

  private def df(cols: Seq[String], rows: Seq[Seq[Any]]): DataFrame = {
    val schema = StructType(cols.map(c => StructField(c, StringType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row(r.map(_.toString): _*))), schema)
  }

  // PATIENT: pid is almost a key; #257 has a duplicate with conflicting dod,
  // and #257/#3/#4 have no admissions.
  private val patient = df(Seq("pid", "gender", "expire", "dod"), Seq(
    Seq("1", "M", "1", "2010-01-01"),
    Seq("2", "F", "1", "2011-02-02"),
    Seq("3", "M", "0", "NA"),
    Seq("4", "F", "0", "NA"),
    Seq("257", "M", "1", "2022-09-09"),
    Seq("257", "M", "1", "2023-03-03"), // conflicting dod → pid→dod approximate
  ))

  // ADMISSION: aid key; pid 9 dangles (no such patient).
  private val admission = df(Seq("aid", "pid", "insurance", "diag"), Seq(
    Seq("a1", "1", "Medicare", "flu"),
    Seq("a2", "1", "Medicare", "cold"),
    Seq("a3", "2", "Private", "flu"),
    Seq("a4", "2", "Private", "fracture"),
    Seq("a5", "9", "Self", "pain"),
  ))

  private val catalog = Map("patient" -> patient, "admission" -> admission)
  private val joinSpec = Join(Rel("patient"), Rel("admission"),
    Seq((AttrRef("patient", "pid"), AttrRef("admission", "pid"))))

  private def materializedFds(spec: ViewSpec): Set[FD] = {
    val schema = ViewSchema.of(spec, t => catalog(t).columns.toSeq)
    val eval   = new ViewEval(schema, catalog)
    val ids    = AS.toSeq(schema.idsOf(spec))
    val d      = eval.eval(spec).select(ids.map(i => org.apache.spark.sql.functions.col(s"a$i")): _*)
    Tane.mine(EncodedTable.fromDataFrame(d, ids))
  }

  private lazy val result = InFine.run(joinSpec, catalog)
  private lazy val schema = result.schema

  private def id(alias: String, col: String) = schema.id(AttrRef(alias, col))
  private def fdOf(lhs: Seq[(String, String)], rhs: (String, String)): FD =
    FD(AS.fromIterable(lhs.map { case (a, c) => id(a, c) }), id(rhs._1, rhs._2))

  test("InFine equals direct mining on the materialized view (running example)") {
    val direct = materializedFds(joinSpec)
    assert(result.fds == direct,
      s"\nmissing=${(direct -- result.fds).map(schema.renderFd)}" +
      s"\nextra=${(result.fds -- direct).map(schema.renderFd)}")
  }

  test("base FDs carry 'base' provenance and the base sub-query") {
    val d = fdOf(Seq("admission" -> "aid"), "admission" -> "insurance")
    val t = result.triples.find(_.fd == d)
    assert(t.isDefined, "aid→insurance should survive the join")
    assert(t.get.fdType == FDType.Base)
    assert(t.get.subquery == Rel("admission"))
  }

  test("approximate pid→dod upstages to exact on the left side (patient #257)") {
    val d = fdOf(Seq("patient" -> "pid"), "patient" -> "dod")
    val t = result.triples.find(_.fd == d)
    assert(t.isDefined, s"pid→dod missing from:\n${result.render.mkString("\n")}")
    assert(t.get.fdType == FDType.UpstagedLeft)
    assert(t.get.subquery == joinSpec)
  }

  test("join-key equalities are inferred FDs") {
    val d = fdOf(Seq("patient" -> "pid"), "admission" -> "pid")
    val t = result.triples.find(_.fd == d)
    assert(t.isDefined)
    assert(t.get.fdType == FDType.Inferred)
  }

  test("transitivity through the join key yields inferred insurance→gender") {
    val d = fdOf(Seq("admission" -> "insurance"), "patient" -> "gender")
    val t = result.triples.find(_.fd == d)
    assert(t.isDefined, s"insurance→gender missing:\n${result.render.mkString("\n")}")
    assert(t.get.fdType == FDType.Inferred)
  }

  test("no FD in the output is subsumed by another (global minimality)") {
    val fds = result.fds
    fds.foreach { d =>
      assert(!fds.exists(o => o != d && o.generalizes(d)), schema.renderFd(d))
    }
  }

  test("every reported FD holds on the view (correctness, Theorem 6)") {
    val eval = new ViewEval(schema, catalog)
    val ids  = AS.toSeq(schema.idsOf(joinSpec))
    val v    = new DriverValidator(EncodedTable.fromDataFrame(
      eval.eval(joinSpec).select(ids.map(i => org.apache.spark.sql.functions.col(s"a$i")): _*), ids))
    result.fds.foreach(d => assert(v.holds(d.lhs, d.rhs), schema.renderFd(d)))
  }

  test("type counts sum to the total") {
    assert(result.countByType.values.sum == result.triples.size)
  }

  test("stats record time in the join stages") {
    assert(result.stats.nanos("base") > 0)
    assert(result.stats.nanos.contains("upstaged"))
  }

  test("selection on top of the join: upstaged selection FDs appear") {
    val sel = Select(Pred.Cmp(AttrRef("admission", "insurance"), "=", "Medicare"), joinSpec)
    val res = InFine.run(sel, catalog)
    val direct = materializedFds(sel)
    assert(res.fds == direct,
      s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
      s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
    // Only patient #1's rows survive — insurance is constant now.
    val constIns = FD(AS.empty, res.schema.id(AttrRef("admission", "insurance")))
    val t = res.triples.find(_.fd == constIns)
    assert(t.isDefined)
    assert(t.get.fdType == FDType.UpstagedSelection)
  }

  test("projection restricts mining to A_V") {
    val proj = Project(
      Seq(AttrRef("patient", "pid"), AttrRef("patient", "gender"),
          AttrRef("admission", "insurance")),
      joinSpec)
    val res    = InFine.run(proj, catalog)
    val direct = materializedFds(proj)
    assert(res.fds == direct,
      s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
      s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
    val keep = res.schema.idsOf(proj)
    res.fds.foreach(d => assert(AS.subsetOf(d.attrs, keep)))
  }

  test("semi-join view behaves like a one-sided selection") {
    val semi = Join(Rel("patient"), Rel("admission"),
      Seq((AttrRef("patient", "pid"), AttrRef("admission", "pid"))), JoinKind.LeftSemi)
    val res    = InFine.run(semi, catalog)
    val direct = materializedFds(semi)
    assert(res.fds == direct,
      s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
      s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
    assert(res.triples.exists(_.fdType == FDType.UpstagedLeft))
  }

  test("outer join fallback still matches direct mining") {
    val outer = Join(Rel("patient"), Rel("admission"),
      Seq((AttrRef("patient", "pid"), AttrRef("admission", "pid"))), JoinKind.LeftOuter)
    val res    = InFine.run(outer, catalog)
    val direct = materializedFds(outer)
    assert(res.fds == direct,
      s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
      s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
  }

  test("provenance triples render human-readably") {
    val rendered = result.render
    assert(rendered.nonEmpty)
    assert(rendered.exists(_.contains("\"base\"")))
    assert(rendered.exists(_.contains("patient ⋈")))
  }
}
