package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {

  test("assertEquivalent accepts a matching aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    Oracle.assertEquivalent(
      li.groupBy("l_returnflag").agg(count(lit(1)).as("n")),
      "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("assertEquivalent rejects a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.groupBy("l_returnflag").agg((count(lit(1)) + 1).as("n")),
        "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("assertEquivalent rejects mismatched column sets") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.select(col("l_returnflag").as("flag")).distinct(),
        "SELECT DISTINCT l_returnflag FROM lineitem",
        "lineitem" -> li)
    }
  }

  test("distinct-count semantics match between Spark and DuckDB (FD checks)") {
    val o = SynthData.orders(spark, sf = 0.001)
    Oracle.assertEquivalent(
      o.select("o_orderstatus", "o_orderdate").distinct(),
      "SELECT DISTINCT o_orderstatus, o_orderdate FROM orders",
      "orders" -> o)
  }
}
