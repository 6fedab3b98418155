package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.SynthData

/** TPC-H-lite: extends the provided `SynthData` generators with the tables
  * the paper's Q2*, Q9* and Q11* views need (supplier, nation, region, partsupp)
  * and a lineitem variant carrying `l_suppkey`.
  *
  * All derived columns are pure hash functions of the key columns
  * (`xxhash64`), so the data is deterministic under any partitioning and
  * carries *intentional* FDs (e.g. `n_nationkey ↔ n_name`,
  * `s_nationkey → s_phone_cc`) that the discovery pipeline must find.
  */
object TpchLite {

  private def h(c: org.apache.spark.sql.Column, salt: Int) =
    abs(xxhash64(c, lit(salt)))

  def nation(spark: SparkSession): DataFrame = {
    spark.range(0, 25).select(
      col("id").cast(IntegerType)                     as "n_nationkey",
      concat(lit("NATION_"), col("id"))               as "n_name",
      (col("id") % 5).cast(IntegerType)               as "n_regionkey",
      (h(col("id"), 11) % 50 + 10).cast(IntegerType)  as "n_zone",
    )
  }

  def region(spark: SparkSession): DataFrame = {
    spark.range(0, 5).select(
      col("id").cast(IntegerType)       as "r_regionkey",
      concat(lit("REGION_"), col("id")) as "r_name",
      (col("id") * 1000 + 7)            as "r_area",
    )
  }

  def supplier(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val n = math.max(10L, (10000 * sf).toLong)
    spark.range(1, n + 1).select(
      col("id")                                        as "s_suppkey",
      concat(lit("SUPP_"), col("id"))                  as "s_name",
      (h(col("id"), 21) % 25).cast(IntegerType)        as "s_nationkey",
      round(h(col("id"), 22).cast(DoubleType) % 10000 - 1000, 2) as "s_acctbal",
      // phone country code is a function of the nation — an FD across cols.
      (h(col("id"), 21) % 25 + 10).cast(IntegerType)   as "s_phone_cc",
      (h(col("id"), 23) % 5).cast(IntegerType)         as "s_rating",
      concat(lit("CITY_"), h(col("id"), 24) % 40)      as "s_city",
    )
  }

  /** 4 suppliers per part; (ps_partkey, ps_suppkey) is the key. */
  def partsupp(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val nPart = math.max(1L, (200000 * sf).toLong)
    val nSupp = math.max(10L, (10000 * sf).toLong)
    spark.range(0, nPart * 4).select(
      (col("id") / 4 + 1).cast(LongType)                  as "ps_partkey",
      (h(col("id"), 31) % nSupp + 1)                      as "ps_suppkey",
      (h(col("id"), 32) % 10000).cast(IntegerType)        as "ps_availqty",
      round(h(col("id"), 33).cast(DoubleType) % 1000 + 1, 2) as "ps_supplycost",
    ).withColumn("ps_cost_band", (col("ps_supplycost") / 100).cast(IntegerType))
  }

  /** `SynthData.lineitem` plus `l_suppkey` drawn from the part's partsupp
    * suppliers, so the Q9* join chain has high coverage like the paper's.
    */
  def lineitemWithSupp(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    val nSupp = math.max(10L, (10000 * sf).toLong)
    val li = SynthData.lineitem(spark, sf, seed)
    // Mirror partsupp's supplier derivation: partsupp row id for part p,
    // slot i (0..3) is (p-1)*4 + i, and its suppkey is h(rowId, 31) % nSupp + 1.
    val slot = (abs(xxhash64(col("l_orderkey"), col("l_linenumber"), lit(41))) % 4)
    val psRow = (col("l_partkey") - 1) * 4 + slot
    li.withColumn("l_suppkey", abs(xxhash64(psRow, lit(31))) % nSupp + 1)
  }

  /** Full catalog for the TPC-H workload at scale factor `sf`. */
  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "part"     -> SynthData.part(spark, sf),
    "supplier" -> supplier(spark, sf),
    "partsupp" -> partsupp(spark, sf),
    "customer" -> SynthData.customer(spark, sf),
    "orders"   -> SynthData.orders(spark, sf),
    "lineitem" -> lineitemWithSupp(spark, sf),
    "nation"   -> nation(spark),
    "region"   -> region(spark),
  )
}
