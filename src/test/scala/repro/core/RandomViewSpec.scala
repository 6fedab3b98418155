package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types._
import repro.SparkSpec
import repro.fd.{AttrSet => AS, _}
import repro.views._

/** Adversarial completeness check: InFine vs direct mining on randomized
  * SPJ views over randomized small instances (deterministic seeds). This
  * exercises join/selection/projection combinations the 16 workloads don't.
  */
class RandomViewSpec extends SparkSpec {

  private def df(cols: Seq[String], rows: Seq[Seq[Any]]): DataFrame = {
    val schema = StructType(cols.map(c => StructField(c, StringType)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row(r.map(_.toString): _*))), schema)
  }

  private def randomCatalog(rnd: scala.util.Random): Map[String, DataFrame] = {
    def table(name: String, nCols: Int): (String, DataFrame) = {
      val nRows = rnd.nextInt(10) + 1
      val rows  = Seq.fill(nRows)(Seq.fill[Any](nCols)(rnd.nextInt(3)))
      name -> df((0 until nCols).map(i => s"c$i"), rows)
    }
    Map(table("r", rnd.nextInt(2) + 2), table("s", rnd.nextInt(2) + 2), table("t", 2))
  }

  private def randomSpec(rnd: scala.util.Random, catalog: Map[String, DataFrame]): ViewSpec = {
    def pickCol(rel: String): String = {
      val cols = catalog(rel).columns
      cols(rnd.nextInt(cols.length))
    }
    val join1 = Join(Rel("r"), Rel("s"),
      Seq((AttrRef("r", pickCol("r")), AttrRef("s", pickCol("s")))))
    val base: ViewSpec =
      if (rnd.nextBoolean())
        Join(join1, Rel("t"), Seq((AttrRef("s", pickCol("s")), AttrRef("t", pickCol("t")))))
      else join1
    val withSel: ViewSpec =
      if (rnd.nextBoolean())
        Select(Pred.Cmp(AttrRef("r", pickCol("r")), "=", rnd.nextInt(3)), base)
      else base
    if (rnd.nextBoolean()) {
      val schema = ViewSchema.of(withSel, t => catalog(t).columns.toSeq)
      val refs   = ViewSchema.projRefs(withSel, schema)
      val keep   = refs.filter(_ => rnd.nextDouble() < 0.7)
      if (keep.size >= 2) Project(keep, withSel) else withSel
    } else withSel
  }

  private def directFds(spec: ViewSpec, catalog: Map[String, DataFrame]): Set[FD] = {
    val schema = ViewSchema.of(spec, t => catalog(t).columns.toSeq)
    val eval   = new ViewEval(schema, catalog)
    val ids    = AS.toSeq(schema.idsOf(spec))
    val d      = eval.eval(spec).select(ids.map(i => col(s"a$i")): _*)
    Tane.mine(EncodedTable.fromDataFrame(d, ids))
  }

  (0 until 12).foreach { seed =>
    test(s"random SPJ view #$seed: InFine == direct mining") {
      val rnd     = new scala.util.Random(seed * 7919 + 13)
      val catalog = randomCatalog(rnd)
      val spec    = randomSpec(rnd, catalog)
      val res     = InFine.run(spec, catalog)
      val direct  = directFds(spec, catalog)
      assert(res.fds == direct,
        s"\nspec=${spec.render}" +
        s"\nmissing=${(direct -- res.fds).map(res.schema.renderFd)}" +
        s"\nextra=${(res.fds -- direct).map(res.schema.renderFd)}")
    }
  }
}
