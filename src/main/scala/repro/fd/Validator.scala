package repro.fd

import scala.collection.mutable
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.fd.{AttrSet => AS}

/** Validity oracle for candidate FDs over one instance. Attribute indices
  * are global; implementations translate to their own layout.
  */
trait FDValidator {
  def nRows: Long
  /** Distinct count of the value combinations over `attrs`. */
  def cardinality(attrs: AS.T): Long
  /** Does `lhs → rhs` hold on the instance (null == null semantics)? */
  def holds(lhs: AS.T, rhs: Int): Boolean =
    cardinality(lhs) == cardinality(AS.add(lhs, rhs))
  def isKey(attrs: AS.T): Boolean = cardinality(attrs) == nRows
}

/** Driver-side validator over a collected, dictionary-encoded instance —
  * used when the instance fits under the collect threshold; checks run on
  * stripped partitions, as in the paper's single-node miner.
  */
final class DriverValidator(val table: EncodedTable) extends FDValidator {
  private val store = new PartitionStore(table)
  private def loc(attrs: AS.T): AS.T = AS.fromIterable(AS.toSeq(attrs).map(table.local))
  val nRows: Long = table.nRows
  def cardinality(attrs: AS.T): Long =
    if (AS.isEmpty(attrs)) math.min(1L, nRows) else store(loc(attrs)).cardinality.toLong
  override def holds(lhs: AS.T, rhs: Int): Boolean =
    if (AS.isEmpty(lhs)) cardinality(AS.single(rhs)) <= 1
    else store.holds(loc(lhs), table.local(rhs))
}

/** Spark-side validator: FD checks as distinct-count equalities computed by
  * Catalyst over a cached DataFrame whose columns are named `a<globalIdx>`.
  * This is the "mine partitions on-the-fly via groupBy/distinct checks"
  * path of the reproduction hint — the instance is never collected.
  */
final class SparkValidator(val df: DataFrame) extends FDValidator {
  private val cached = df.cache()
  private val cards  = mutable.Map.empty[AS.T, Long]
  lazy val nRows: Long = cached.count()
  def cardinality(attrs: AS.T): Long = cards.getOrElseUpdate(attrs, {
    if (AS.isEmpty(attrs)) math.min(1L, nRows)
    else cached.select(AS.toSeq(attrs).map(i => col(s"a$i")): _*).distinct().count()
  })
}

/** Defers instance materialization until a check actually needs data — the
  * heart of the paper's savings: when logical pruning leaves no candidate
  * to validate, the (partial) join is never computed at all.
  */
final class LazyValidator(mk: () => FDValidator) extends FDValidator {
  private lazy val v = mk()
  /** True once some check has forced materialization. */
  @volatile var materialized = false
  private def force: FDValidator = { materialized = true; v }
  def nRows: Long = force.nRows
  def cardinality(attrs: AS.T): Long = force.cardinality(attrs)
  override def holds(lhs: AS.T, rhs: Int): Boolean = force.holds(lhs, rhs)
  override def isKey(attrs: AS.T): Boolean = force.isKey(attrs)
}

object Validator {
  /** Collect threshold: instances at most this many rows are mined on the
    * driver; larger ones stay distributed. Override with
    * `-Dspark.infine.collectThreshold=N`.
    */
  def collectThreshold: Long =
    sys.props.get("spark.infine.collectThreshold").map(_.toLong).getOrElse(2_000_000L)

  /** Pick the driver or Spark path for `df` (columns `a<idx>` for each global
    * attribute in `attrIds`) based on its row count.
    */
  def forDataFrame(df: DataFrame, attrIds: IndexedSeq[Int]): FDValidator = {
    val n = df.count()
    if (n <= collectThreshold) new DriverValidator(EncodedTable.fromDataFrame(df, attrIds))
    else new SparkValidator(df)
  }
}
