package repro.views

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** The paper's coverage measure for a join (Section V, "Data").
  *
  * `Cov(Join, I, a)` averages, over the distinct join-key values of the
  * input `I`, the ratio between the number of join rows carrying that value
  * and the number of `I` rows carrying it; `Coverage` is the mean of the
  * two sides. Values < 1 mean tuples are dropped by the join (upstaged-FD
  * territory); values > 1 mean tuples are multiplied.
  */
object Coverage {

  /** One side. `joinDf`/`inputDf` carry the key as columns `keyCols`
    * (already identically named — the evaluator's `a<idx>` names).
    */
  def side(joinDf: DataFrame, inputDf: DataFrame, keyCols: Seq[String]): Double = {
    val kCols = keyCols.map(col)
    val inCounts = inputDf.groupBy(kCols: _*).agg(count(lit(1)).as("ci"))
    val jCounts  = joinDf.groupBy(kCols: _*).agg(count(lit(1)).as("cj"))
    val ratios = inCounts
      .join(jCounts, keyCols, "left")
      .select((coalesce(col("cj"), lit(0L)).cast("double") / col("ci")).as("ratio"))
      .agg(avg("ratio").as("cov"))
      .collect()
    Option(ratios.head.get(0)).map(_.asInstanceOf[Double]).getOrElse(0.0)
  }

  /** Coverage(L ◊ R) = ½ (Cov(Join, L, X) + Cov(Join, R, Y)). */
  def of(joinDf: DataFrame, leftDf: DataFrame, rightDf: DataFrame,
         leftKeyCols: Seq[String], rightKeyCols: Seq[String]): Double =
    0.5 * (side(joinDf, leftDf, leftKeyCols) + side(joinDf, rightDf, rightKeyCols))
}
