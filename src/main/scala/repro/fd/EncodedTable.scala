package repro.fd

import org.apache.spark.sql.DataFrame
import repro.fd.{AttrSet => AS}

/** Dictionary-encoded, column-major snapshot of a relational instance.
  *
  * FD validity only depends on value *equality*, so each column is encoded
  * to dense Int codes (null is one more ordinary code — the paper is
  * null-semantics agnostic, and "null == null" matches Spark's `distinct`
  * and the DuckDB oracle). Miners operate over local column positions
  * `0..width-1`; `attrIds` maps positions to the view's global attribute
  * indices so mined FDs can be globalized.
  *
  * @param columns column-major codes, `columns(c)(r)`
  * @param attrIds global attribute index per local column position
  */
final class EncodedTable(val columns: Array[Array[Int]], val attrIds: IndexedSeq[Int]) {
  require(columns.length == attrIds.size, "one attrId per column")
  val width: Int  = columns.length
  val nRows: Int  = if (width == 0) 0 else columns(0).length

  private lazy val localOf: Map[Int, Int] = attrIds.zipWithIndex.toMap

  def local(globalAttr: Int): Int =
    localOf.getOrElse(globalAttr, sys.error(s"attribute $globalAttr not in table (has $attrIds)"))

  def globalize(d: FD): FD =
    FD(AS.fromIterable(AS.toSeq(d.lhs).map(attrIds)), attrIds(d.rhs))

  def localize(d: FD): FD =
    FD(AS.fromIterable(AS.toSeq(d.lhs).map(local)), local(d.rhs))

  /** Restrict to the columns whose global ids are in `globalAttrs`. */
  def project(globalAttrs: AS.T): EncodedTable = {
    val keep = attrIds.zipWithIndex.collect { case (g, i) if AS.contains(globalAttrs, g) => i }
    new EncodedTable(keep.map(columns).toArray, keep.map(attrIds))
  }

  /** Distinct count of the value combinations over local columns `attrs`. */
  def cardinality(attrs: AS.T): Int = {
    if (AS.isEmpty(attrs)) return math.min(nRows, 1)
    val cols = AS.toSeq(attrs).map(columns)
    val seen = new java.util.HashSet[Seq[Int]]()
    var r = 0
    while (r < nRows) {
      seen.add(cols.map(_(r)))
      r += 1
    }
    seen.size
  }
}

object EncodedTable {

  /** Collect `df` and dictionary-encode it. The caller is responsible for
    * only collecting instances below the configured threshold; larger
    * instances stay in Spark and are checked via [[Validator.SparkValidator]].
    */
  def fromDataFrame(df: DataFrame, attrIds: IndexedSeq[Int]): EncodedTable = {
    val rows  = df.collect()
    val width = df.columns.length
    require(width == attrIds.size,
      s"schema mismatch: df has $width cols, ${attrIds.size} attr ids given")
    val cols = Array.ofDim[Array[Int]](width)
    var c = 0
    while (c < width) {
      val dict = new java.util.HashMap[Any, Integer]()
      val out  = new Array[Int](rows.length)
      var r = 0
      while (r < rows.length) {
        val v    = rows(r).get(c) // null hashes fine in HashMap
        var code = dict.get(v)
        if (code == null) { code = dict.size(); dict.put(v, code) }
        out(r) = code
        r += 1
      }
      cols(c) = out
      c += 1
    }
    new EncodedTable(cols, attrIds)
  }

  /** Row-major literal construction for tests. */
  def fromRows(rows: Seq[Seq[Any]], attrIds: IndexedSeq[Int]): EncodedTable = {
    val width = attrIds.size
    require(rows.forall(_.size == width))
    val cols = Array.ofDim[Array[Int]](width)
    var c = 0
    while (c < width) {
      val dict = new java.util.HashMap[Any, Integer]()
      val out  = new Array[Int](rows.length)
      var r = 0
      while (r < rows.length) {
        val v    = rows(r)(c)
        var code = dict.get(v)
        if (code == null) { code = dict.size(); dict.put(v, code) }
        out(r) = code
        r += 1
      }
      cols(c) = out
      c += 1
    }
    new EncodedTable(cols, attrIds)
  }
}
