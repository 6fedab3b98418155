package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** PTC-lite: synthetic stand-in for the Predictive Toxicology Challenge
  * database (paper Table I shapes: atom 3 attrs, connected 3, bond 3,
  * molecule 2). `connected` stores each bond twice (both directions),
  * reproducing the real table's FD set
  * `{atom1,atom2}→bond, {atom1,bond}→atom2, {atom2,bond}→atom1`.
  */
object PtcLite {

  private def h(c: Column, salt: Int) = abs(xxhash64(c, lit(salt)))

  private def nMol(sf: Double)  = math.max(20L, (343 * math.min(1.0, sf * 10)).toLong)
  private def nAtom(sf: Double) = math.max(120L, (12333 * sf).toLong)
  private def nBond(sf: Double) = math.max(120L, (12379 * sf).toLong)

  def molecule(spark: SparkSession, sf: Double = 1.0): DataFrame =
    spark.range(1, nMol(sf) + 1).select(
      concat(lit("m"), col("id"))                      as "molecule_id",
      pick(col("id"), 61, "POS", "NEG", "EQUIVOCAL")   as "label",
    )

  def atom(spark: SparkSession, sf: Double = 1.0): DataFrame =
    spark.range(1, nAtom(sf) + 1).select(
      concat(lit("a"), col("id"))                      as "atom_id",
      concat(lit("m"), h(col("id"), 62) % nMol(sf) + 1) as "molecule_id",
      pick(col("id"), 63, "c", "h", "o", "n", "s", "cl") as "element",
    )

  def bond(spark: SparkSession, sf: Double = 1.0): DataFrame =
    spark.range(1, nBond(sf) + 1).select(
      concat(lit("b"), col("id"))                      as "bond_id",
      concat(lit("m"), h(col("id"), 64) % nMol(sf) + 1) as "molecule_id",
      (h(col("id"), 65) % 3 + 1).cast(IntegerType)     as "btype",
    )

  /** Each bond appears in both orientations → 2 × |bond| rows. */
  def connected(spark: SparkSession, sf: Double = 1.0): DataFrame = {
    val nA = nAtom(sf); val nB = nBond(sf)
    val bondId = (col("id") / 2).cast(LongType) + 1
    val fwd    = col("id") % 2 === 0
    val a1     = h(bondId, 66) % nA + 1
    val a2     = (a1 + h(bondId, 67) % (nA - 1)) % nA + 1
    spark.range(0, nB * 2).select(
      concat(lit("a"), when(fwd, a1).otherwise(a2)) as "atom1_id",
      concat(lit("a"), when(fwd, a2).otherwise(a1)) as "atom2_id",
      concat(lit("b"), bondId)                      as "bond_id",
    )
  }

  private def pick(c: Column, salt: Int, values: String*): Column =
    element_at(array(values.map(lit): _*), (h(c, salt) % values.size + 1).cast(IntegerType))

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "molecule"  -> molecule(spark, sf),
    "atom"      -> atom(spark, sf),
    "bond"      -> bond(spark, sf),
    "connected" -> connected(spark, sf),
  )
}
