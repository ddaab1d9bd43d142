package repro

import org.scalatest.funsuite.AnyFunSuite

/** Smoke coverage for the provided TPC-H-lite generators and the DuckDB
  * oracle wiring (every query-result test elsewhere relies on Oracle). */
class SynthDataSpec extends AnyFunSuite with SparkSpec {

  test("lineitem generates deterministic row counts at SF") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000L)
    assert(li.columns.contains("l_orderkey"))
  }

  test("orders/customer/part have expected key ranges") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val p = SynthData.part(spark, sf = 0.001)
    assert(o.count() == 1500L && c.count() == 150L && p.count() == 200L)
    import org.apache.spark.sql.functions._
    assert(c.agg(min("c_custkey")).head.getLong(0) == 1L)
    assert(p.agg(max("p_partkey")).head.getLong(0) == 200L)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100).groupBy("k").count()
    val top = z.orderBy(org.apache.spark.sql.functions.desc("count")).head
    assert(top.getLong(0) <= 3L, s"most frequent key ${top.getLong(0)}")
  }

  test("uniform keys cover the key space") {
    val u = SynthData.uniformKeys(spark, rows = 5000, nKeys = 10)
    assert(u.select("k").distinct().count() == 10L)
  }

  test("Oracle agrees with Spark on a TPC-H-style aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    import org.apache.spark.sql.functions._
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("Oracle catches a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    import org.apache.spark.sql.functions._
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt")) // off-by-one on purpose
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
