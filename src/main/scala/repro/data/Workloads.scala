package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.views._

/** Paper-reported numbers for one SPJ view (Tables II–III), kept beside the
  * workload definition so benches can print paper-vs-measured rows.
  */
final case class PaperRow(
    atts: Int, tuples: Long, fds: Int, coverage: Double,
    accUp: Double, accInf: Double, accMine: Double,
    ioS: Double, upstageS: Double, mineS: Double,
)

/** One SPJ view of the paper's evaluation (Table II). */
final case class Workload(db: String, name: String, spec: ViewSpec, paper: PaperRow)

/** The paper's 16 SPJ views over the four (synthetic stand-in) databases.
  * Join structures follow Table II; selections/projections follow the
  * adapted TPC-H queries ("removed group-by/order-by, used the specified
  * constants") and the (Att#) column of Table III.
  */
object Workloads {

  def a(alias: String, col: String): AttrRef = AttrRef(alias, col)
  private def eq(l: (String, String), r: (String, String)): (AttrRef, AttrRef) =
    (AttrRef(l._1, l._2), AttrRef(r._1, r._2))

  def catalog(db: String, spark: SparkSession, sf: Double): Map[String, DataFrame] = db match {
    case "MIMIC3" => MimicLite.catalog(spark, sf)
    case "PTE"    => PteLite.catalog(spark, sf)
    case "PTC"    => PtcLite.catalog(spark, sf)
    case "TPC-H"  => TpchLite.catalog(spark, sf)
    case other    => sys.error(s"unknown db $other")
  }

  // ---------------------------------------------------------------- MIMIC3
  private val qPatAdm = Workload("MIMIC3", "Q(patients ⋈ admissions)",
    Project(
      Seq(a("patients", "subject_id"), a("patients", "gender"), a("patients", "dob"),
          a("patients", "dod"), a("patients", "expire_flag"),
          a("admissions", "subject_id"), a("admissions", "admission_type"),
          a("admissions", "insurance"), a("admissions", "diagnosis"),
          a("admissions", "hospital_expire_flag")),
      Select(Pred.Cmp(a("admissions", "admission_type"), "=", "EMERGENCY"),
        Join(Rel("patients"), Rel("admissions"),
          Seq(eq("patients" -> "subject_id", "admissions" -> "subject_id"))))),
    PaperRow(10, 6736, 16, 0.79, 0.563, 0.0, 0.437, 0.2360, 0.0015, 0.0230))

  private val diagPat = Workload("MIMIC3", "diagnoses_icd ⋈ patients",
    Join(Rel("diagnoses_icd"), Rel("patients"),
      Seq(eq("diagnoses_icd" -> "subject_id", "patients" -> "subject_id"))),
    PaperRow(12, 651047, 22, 7.50, 0.591, 0.273, 0.136, 2.1876, 0.0015, 2.3120))

  private val dicdDiag = Workload("MIMIC3", "d_icd_diagnoses ⋈ diagnoses_icd",
    Join(Rel("d_icd_diagnoses"), Rel("diagnoses_icd"),
      Seq(eq("d_icd_diagnoses" -> "icd9_code", "diagnoses_icd" -> "icd9_code"))),
    PaperRow(7, 658498, 12, 22.84, 0.333, 0.0, 0.667, 1.7202, 0.0000, 0.3497))

  private val diagPatDicd = Workload("MIMIC3", "[diagnoses_icd ⋈ patients] ⋈ d_icd_diagnoses",
    Join(
      Join(Rel("diagnoses_icd"), Rel("patients"),
        Seq(eq("diagnoses_icd" -> "subject_id", "patients" -> "subject_id"))),
      Rel("d_icd_diagnoses"),
      Seq(eq("diagnoses_icd" -> "icd9_code", "d_icd_diagnoses" -> "icd9_code"))),
    PaperRow(14, 658498, 44, 22.84, 0.545, 0.0, 0.455, 5.1232, 0.0000, 6.1325))

  // ------------------------------------------------------------------- PTE
  private val atmDrug = Workload("PTE", "atm ⋈ drug",
    Join(Rel("atm"), Rel("drug"), Seq(eq("atm" -> "drug_id", "drug" -> "drug_id"))),
    PaperRow(5, 9189, 5, 14.01, 1.0, 0.0, 0.0, 0.0246, 0.0000, 0.0000))

  private val activeDrug = Workload("PTE", "active ⋈ drug",
    Join(Rel("active"), Rel("drug"), Seq(eq("active" -> "drug_id", "drug" -> "drug_id"))),
    PaperRow(2, 299, 1, 0.94, 1.0, 0.0, 0.0, 0.0015, 0.0000, 0.0000))

  private val bondDrugActive = Workload("PTE", "[bond ⋈ drug] ⋈ active",
    Join(
      Join(Rel("bond"), Rel("drug"), Seq(eq("bond" -> "drug_id", "drug" -> "drug_id"))),
      Rel("active"),
      Seq(eq("drug" -> "drug_id", "active" -> "drug_id"))),
    PaperRow(6, 7994, 6, 13.83, 0.67, 0.33, 0.0, 0.0215, 0.0030, 0.0000))

  private val atmBondAtmDrug = Workload("PTE", "[atm ⋈ bond ⋈ atm] ⋈ drug",
    Join(
      Join(
        Join(Rel("atm", "atm1"), Rel("bond"),
          Seq(eq("atm1" -> "atm_id", "bond" -> "atom1_id"))),
        Rel("atm", "atm2"),
        Seq(eq("bond" -> "atom2_id", "atm2" -> "atm_id"))),
      Rel("drug"),
      Seq(eq("bond" -> "drug_id", "drug" -> "drug_id"))),
    PaperRow(14, 9317, 24, 14.20, 1.0, 0.0, 0.0, 0.0879, 0.0030, 0.0492))

  // ------------------------------------------------------------------- PTC
  private val atomMol = Workload("PTC", "atom ⋈ molecule",
    Join(Rel("atom"), Rel("molecule"),
      Seq(eq("atom" -> "molecule_id", "molecule" -> "molecule_id"))),
    PaperRow(4, 9111, 4, 13.67, 0.75, 0.25, 0.0, 0.0231, 0.0000, 0.0015))

  private val connBond = Workload("PTC", "connected ⋈ bond",
    Join(Rel("connected"), Rel("bond"),
      Seq(eq("connected" -> "bond_id", "bond" -> "bond_id"))),
    PaperRow(5, 24758, 8, 1.50, 0.625, 0.375, 0.0, 0.1012, 0.0015, 0.0015))

  private val connBondMol = Workload("PTC", "[connected ⋈ bond] ⋈ molecule",
    Join(
      Join(Rel("connected"), Rel("bond"),
        Seq(eq("connected" -> "bond_id", "bond" -> "bond_id"))),
      Rel("molecule"),
      Seq(eq("bond" -> "molecule_id", "molecule" -> "molecule_id"))),
    PaperRow(6, 18312, 12, 27.08, 0.75, 0.25, 0.0, 0.0686, 0.0000, 0.0030))

  private val connAtomMol = Workload("PTC", "connected ⋈_id1 [atom ⋈ molecule]",
    Join(Rel("connected"),
      Join(Rel("atom"), Rel("molecule"),
        Seq(eq("atom" -> "molecule_id", "molecule" -> "molecule_id"))),
      Seq(eq("connected" -> "atom1_id", "atom" -> "atom_id"))),
    PaperRow(6, 18312, 12, 27.08, 0.583, 0.417, 0.0, 0.0903, 0.0030, 0.0045))

  // ----------------------------------------------------------------- TPC-H
  private val q2 = Workload("TPC-H", "Q2*(P ⋈ PS ⋈ S ⋈ N ⋈ R)",
    Project(
      Seq(a("part", "p_partkey"), a("partsupp", "ps_partkey"), a("partsupp", "ps_suppkey"),
          a("supplier", "s_suppkey"), a("supplier", "s_nationkey"), a("nation", "n_nationkey"),
          a("nation", "n_regionkey"), a("region", "r_regionkey"),
          a("part", "p_type"), a("partsupp", "ps_supplycost"),
          a("supplier", "s_acctbal"), a("nation", "n_name"), a("region", "r_name")),
      Select(Pred.Cmp(a("part", "p_size"), "=", 15),
        Join(
          Join(
            Join(
              Join(Rel("part"), Rel("partsupp"),
                Seq(eq("part" -> "p_partkey", "partsupp" -> "ps_partkey"))),
              Rel("supplier"),
              Seq(eq("partsupp" -> "ps_suppkey", "supplier" -> "s_suppkey"))),
            Rel("nation"),
            Seq(eq("supplier" -> "s_nationkey", "nation" -> "n_nationkey"))),
          Rel("region"),
          Seq(eq("nation" -> "n_regionkey", "region" -> "r_regionkey"))))),
    PaperRow(10, 21696, 69, 1.50, 0.594, 0.087, 0.319, 0.1299, 0.0045, 0.0120))

  private val q3 = Workload("TPC-H", "Q3*(C ⋈ O ⋈ L)",
    Project(
      Seq(a("orders", "o_orderkey"), a("lineitem", "l_orderkey"),
          a("lineitem", "l_extendedprice"), a("lineitem", "l_discount"),
          a("orders", "o_orderdate"), a("customer", "c_mktsegment")),
      Select(Pred.And(
          Pred.Cmp(a("customer", "c_mktsegment"), "=", "BUILDING"),
          Pred.And(
            Pred.Cmp(a("orders", "o_orderdate"), "<", "1995-03-15"),
            Pred.Cmp(a("lineitem", "l_shipdate"), ">", "1995-03-15"))),
        Join(
          Join(Rel("customer"), Rel("orders"),
            Seq(eq("customer" -> "c_custkey", "orders" -> "o_custkey"))),
          Rel("lineitem"),
          Seq(eq("orders" -> "o_orderkey", "lineitem" -> "l_orderkey"))))),
    PaperRow(6, 60150, 14, 0.12, 0.429, 0.0, 0.571, 13.036, 0.0000, 0.0198))

  private val q9 = Workload("TPC-H", "Q9*(P ⋈ PS ⋈ S ⋈ L ⋈ O ⋈ N)",
    Project(
      Seq(a("part", "p_type"), a("partsupp", "ps_supplycost"),
          a("supplier", "s_nationkey"), a("nation", "n_nationkey"), a("nation", "n_name"),
          a("lineitem", "l_quantity"), a("lineitem", "l_extendedprice"),
          a("lineitem", "l_discount"), a("orders", "o_orderdate")),
      Select(Pred.Cmp(a("part", "p_type"), "=", "PROMO"),
        Join(
          Join(
            Join(
              Join(
                Join(Rel("part"), Rel("partsupp"),
                  Seq(eq("part" -> "p_partkey", "partsupp" -> "ps_partkey"))),
                Rel("supplier"),
                Seq(eq("partsupp" -> "ps_suppkey", "supplier" -> "s_suppkey"))),
              Rel("lineitem"),
              Seq(eq("partsupp" -> "ps_partkey", "lineitem" -> "l_partkey"),
                  eq("partsupp" -> "ps_suppkey", "lineitem" -> "l_suppkey"))),
            Rel("orders"),
            Seq(eq("lineitem" -> "l_orderkey", "orders" -> "o_orderkey"))),
          Rel("nation"),
          Seq(eq("supplier" -> "s_nationkey", "nation" -> "n_nationkey"))))),
    PaperRow(9, 3735632, 8, 25813.0, 0.875, 0.125, 0.0, 16.967, 0.0015, 12.1261))

  private val q11 = Workload("TPC-H", "Q11*(PS ⋈ S ⋈ N)",
    Project(
      Seq(a("partsupp", "ps_partkey"), a("partsupp", "ps_suppkey"),
          a("partsupp", "ps_availqty"), a("partsupp", "ps_supplycost"),
          a("supplier", "s_suppkey"), a("supplier", "s_name"), a("supplier", "s_nationkey"),
          a("supplier", "s_acctbal"), a("supplier", "s_phone_cc"), a("supplier", "s_rating"),
          a("supplier", "s_city"), a("nation", "n_nationkey"), a("nation", "n_name"),
          a("nation", "n_regionkey"), a("nation", "n_zone")),
      // The paper's Q11 filters one nation; a region filter keeps the view
      // non-empty at the smallest scale factors (5 of 25 nations survive).
      Select(Pred.Cmp(a("nation", "n_regionkey"), "=", 2),
        Join(
          Join(Rel("partsupp"), Rel("supplier"),
            Seq(eq("partsupp" -> "ps_suppkey", "supplier" -> "s_suppkey"))),
          Rel("nation"),
          Seq(eq("supplier" -> "s_nationkey", "nation" -> "n_nationkey"))))),
    PaperRow(15, 284160, 151, 80.09, 0.636, 0.232, 0.132, 13.771, 0.0246, 0.5777))

  val all: Seq[Workload] = Seq(
    atmDrug, activeDrug, bondDrugActive, atmBondAtmDrug,
    atomMol, connBond, connBondMol, connAtomMol,
    diagPat, dicdDiag, diagPatDicd, qPatAdm,
    q2, q3, q9, q11,
  )

  def byName(name: String): Workload =
    all.find(_.name == name).getOrElse(sys.error(s"unknown workload $name"))

  /** Base tables per DB, in the order of the paper's Table I. */
  val tablesByDb: Seq[(String, Seq[String])] = Seq(
    "MIMIC3" -> Seq("patients", "admissions", "diagnoses_icd", "d_icd_diagnoses"),
    "PTE"    -> Seq("active", "bond", "atm", "drug"),
    "PTC"    -> Seq("atom", "connected", "bond", "molecule"),
    "TPC-H"  -> Seq("supplier", "customer", "orders", "lineitem",
                    "nation", "region", "part", "partsupp"),
  )
}
