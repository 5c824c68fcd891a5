package repro.data

import repro.{Oracle, SparkSpec, SynthData}

/** Smoke tests for the provided TPC-H-lite generators + the DuckDB oracle
  * wiring itself (an aggregation over lineitem checked end-to-end).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem scales with sf and is deterministic") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == 6000)
    assert(a.exceptAll(b).count() == 0)
  }

  test("oracle agrees on an aggregation over lineitem") {
    import org.apache.spark.sql.functions._
    // collecting DateType rows trips the Java-date decoder in this container;
    // the oracle stores VARCHAR anyway, so ship dates as strings
    val li = SynthData.lineitem(spark, sf = 0.001)
      .withColumn("l_shipdate", col("l_shipdate").cast("string"))
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle agrees on a join of orders and customer") {
    import org.apache.spark.sql.functions.col
    val o = SynthData.orders(spark, sf = 0.001)
      .withColumn("o_orderdate", col("o_orderdate").cast("string"))
    val c = SynthData.customer(spark, sf = 0.001)
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").count()
      .selectExpr("c_mktsegment", "count AS cnt")
    Oracle.assertEquivalent(joined,
      """SELECT c_mktsegment, count(*) AS cnt FROM orders
        |JOIN customer ON o_custkey = c_custkey GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
