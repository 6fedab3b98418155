package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** MIMIC-III-lite: synthetic stand-in for the restricted-access clinical
  * database, with the paper's table shapes (Table I) and — crucially — the
  * FD phenomena the paper exploits:
  *
  *   - `patients.subject_id` is *almost* a key: a small set of subjects has
  *     a duplicate row with a conflicting `dod`, so `subject_id → dod` is
  *     approximate; the duplicated subjects never appear in `admissions`,
  *     so the FD upstages to exact on `patients ⋈ admissions` (the paper's
  *     patient #257 scenario);
  *   - foreign keys have partial coverage in both directions (dangling
  *     subjects / unreferenced patients), driving coverage < 1;
  *   - `admissions` carries many hash-derived dependent columns, giving it
  *     a large FD set like the real table's 631.
  */
object MimicLite {

  private def h(c: Column, salt: Int) = abs(xxhash64(c, lit(salt)))
  private def pick(c: Column, salt: Int, values: String*): Column =
    element_at(array(values.map(lit): _*), (h(c, salt) % values.size + 1).cast(IntegerType))

  /** Number of duplicated (FD-violating) subjects for a patients table of n. */
  private def nDup(n: Long): Long = math.max(2L, n / 50)

  def patients(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val n   = math.max(60L, (46520 * sf).toLong)
    val dup = nDup(n)
    def row(ids: DataFrame, dodSalt: Int): DataFrame = ids.select(
      col("id")                                               as "subject_id",
      pick(col("id"), 1, "M", "F")                            as "gender",
      date_add(lit("1920-01-01").cast(DateType),
               (h(col("id"), 2) % 29000).cast(IntegerType))   as "dob",
      when(h(col("id"), 3) % 2 === 1,
           concat(lit("2010-"), lpad((h(col("id"), dodSalt) % 12 + 1).cast(StringType), 2, "0"),
                  lit("-"), lpad((h(col("id"), dodSalt + 1) % 28 + 1).cast(StringType), 2, "0")))
        .otherwise(lit("N/A"))                                as "dod",
      (h(col("id"), 3) % 2).cast(IntegerType)                 as "expire_flag",
      pick(col("id"), 5, "SINGLE", "MARRIED", "WIDOWED", "DIVORCED") as "marital_status",
      pick(col("id"), 6, "CATHOLIC", "PROTESTANT", "JEWISH", "MUSLIM", "BUDDHIST", "NONE") as "religion",
    )
    val base = row(spark.range(1, n + 1).toDF(), 4)
    // Duplicate rows: same subject, conflicting dod (only meaningful for
    // expired subjects — dod of alive ones is the constant "N/A").
    val dups = row(
      spark.range(1, 2 * dup + 1).toDF().filter(abs(xxhash64(col("id"), lit(3))) % 2 === 1), 7)
    base.unionAll(dups)
  }

  /** Subjects referenced by admissions: skips the duplicated low ids and the
    * top 5% of patients, and overshoots the patient domain by 2% (dangling).
    */
  private def subjectOf(c: Column, nPatients: Long): Column = {
    val lo = 2 * nDup(nPatients) + 1
    val hi = math.max((nPatients * 1.02).toLong, nPatients + 3) // ≥2 dangling ids
    h(c, 10) % (hi - lo) + lo
  }

  def admissions(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val n  = math.max(80L, (58976 * sf).toLong)
    val nP = math.max(60L, (46520 * sf).toLong)
    val admit = date_add(lit("2008-01-01").cast(DateType),
                         (h(col("id"), 11) % 2000).cast(IntegerType))
    spark.range(1, n + 1).select(
      col("id")                                        as "hadm_id",
      subjectOf(col("id"), nP)                         as "subject_id",
      admit                                            as "admittime",
      date_add(admit, (h(col("id"), 12) % 30 + 1).cast(IntegerType)) as "dischtime",
      pick(col("id"), 13, "EMERGENCY", "ELECTIVE", "URGENT", "NEWBORN") as "admission_type",
      pick(col("id"), 14, "EMERGENCY ROOM", "PHYS REFERRAL", "TRANSFER", "CLINIC REFERRAL", "HMO REFERRAL") as "admission_location",
      pick(col("id"), 15, "Medicare", "Private", "Medicaid", "Government", "Self Pay") as "insurance",
      // language is a function of the ethnicity *code* — an intra-table FD.
      pick(h(col("id"), 16) % 6, 17, "ENGL", "SPAN", "RUSS", "MAND", "FREN", "PORT") as "language",
      pick(col("id"), 18, "CATHOLIC", "PROTESTANT", "JEWISH", "NONE")   as "religion",
      pick(col("id"), 19, "SINGLE", "MARRIED", "WIDOWED")               as "marital_status",
      concat(lit("ETH_"), h(col("id"), 16) % 6)                         as "ethnicity",
      date_add(admit, -1)                              as "edregtime",
      concat(lit("DIAG_"), h(col("id"), 21) % 200)     as "diagnosis",
      (h(col("id"), 22) % 2).cast(IntegerType)         as "hospital_expire_flag",
      lit(1).cast(IntegerType)                         as "has_chartevents_data",
      year(admit)                                      as "admit_year",
      (h(col("id"), 12) % 30 + 1).cast(IntegerType)    as "los_days",
      // insurance_code is a function of insurance — another FD.
      (h(col("id"), 15) % 5 + 100).cast(IntegerType)   as "insurance_code",
    )
  }

  def diagnosesIcd(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val n    = math.max(200L, (651047 * sf).toLong)
    val nAdm = math.max(80L, (58976 * sf).toLong)
    val nP   = math.max(60L, (46520 * sf).toLong)
    val nIcd = math.max(40L, (14710 * sf).toLong)
    // hadm overshoots admissions' domain by 2% (dangling admissions).
    val hadm = h(col("id"), 30) % ((nAdm * 1.02).toLong) + 1
    spark.range(1, n + 1).select(
      col("id")                                    as "row_id",
      subjectOf(hadm, nP)                          as "subject_id", // = admissions', so hadm→subject holds
      hadm                                         as "hadm_id",
      concat(lit("ICD"), h(col("id"), 31) % ((nIcd * 1.05).toLong)) as "icd9_code",
    )
  }

  def dIcdDiagnoses(spark: SparkSession, sf: Double = 0.01): DataFrame = {
    val n = math.max(40L, (14710 * sf).toLong)
    spark.range(0, n).select(
      concat(lit("ICD"), col("id"))                as "icd9_code",
      concat(lit("SHORT_"), h(col("id"), 32) % (n / 2 + 1)) as "short_title",
      concat(lit("LONG_"), col("id"))              as "long_title",
    )
  }

  def catalog(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "patients"        -> patients(spark, sf),
    "admissions"      -> admissions(spark, sf),
    "diagnoses_icd"   -> diagnosesIcd(spark, sf),
    "d_icd_diagnoses" -> dIcdDiagnoses(spark, sf),
  )
}
