package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** PTE-lite: synthetic stand-in for the Predictive Toxicology Evaluation
  * database (paper Table I shapes: drug 1 attr, active 2, bond 4, atm 5).
  * `active` covers only ~88% of the drugs (paper: 300 actives / 340 drugs,
  * coverage 0.94 on active ⋈ drug), and `atm`/`bond` reference drugs with
  * skewed multiplicity so joins multiply tuples (coverage ≈ 14 like the
  * paper's).
  */
object PteLite {

  private def h(c: Column, salt: Int) = abs(xxhash64(c, lit(salt)))

  def drug(spark: SparkSession, sf: Double = 1.0): DataFrame = {
    val n = math.max(20L, (340 * math.min(1.0, sf * 10)).toLong)
    spark.range(1, n + 1).select(concat(lit("d"), col("id")) as "drug_id")
  }

  def active(spark: SparkSession, sf: Double = 1.0): DataFrame = {
    val nDrug = math.max(20L, (340 * math.min(1.0, sf * 10)).toLong)
    val n     = (nDrug * 300) / 340 // ~88% of drugs are tested active
    spark.range(1, n + 1).select(
      concat(lit("d"), col("id"))                   as "drug_id",
      (h(col("id"), 51) % 3).cast(IntegerType)      as "activity",
    )
  }

  def atm(spark: SparkSession, sf: Double = 1.0): DataFrame = {
    val nDrug = math.max(20L, (340 * math.min(1.0, sf * 10)).toLong)
    val n     = math.max(100L, (9189 * sf).toLong)
    spark.range(1, n + 1).select(
      concat(lit("a"), col("id"))                        as "atm_id",
      concat(lit("d"), h(col("id"), 52) % nDrug + 1)     as "drug_id",
      concat(lit("el_"), h(col("id"), 53) % 10)          as "element",
      // charge_type is a function of the element — an intra-table FD.
      (h(h(col("id"), 53) % 10, 54) % 4).cast(IntegerType) as "charge_type",
      round(h(col("id"), 55).cast(DoubleType) % 200 / 100 - 1, 2) as "charge",
    )
  }

  def bond(spark: SparkSession, sf: Double = 1.0): DataFrame = {
    val nAtm  = math.max(100L, (9189 * sf).toLong)
    val n     = math.max(100L, (9317 * sf).toLong)
    // Bonds connect two atoms of the same drug; we derive the drug from the
    // first atom so bond.drug_id is consistent with atm.drug_id.
    val a1 = h(col("id"), 56) % nAtm + 1
    spark.range(1, n + 1).select(
      concat(lit("b"), col("id"))                    as "bond_id",
      concat(lit("d"), h(a1, 52) % math.max(20L, (340 * math.min(1.0, sf * 10)).toLong) + 1) as "drug_id",
      concat(lit("a"), a1)                           as "atom1_id",
      concat(lit("a"), (a1 % nAtm) + 1)              as "atom2_id",
    )
  }

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "drug"   -> drug(spark, sf),
    "active" -> active(spark, sf),
    "atm"    -> atm(spark, sf),
    "bond"   -> bond(spark, sf),
  )
}
