package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB oracle
  * harness itself: a Spark aggregate checked against DuckDB proves the
  * oracle wiring (string canonicalization, column matching) works before the
  * TRA suites rely on it.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator is deterministic and sized by the scale factor") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    assert(a.count() == 6000)
    assert(a.except(b).isEmpty && b.except(a).isEmpty)
  }

  test("orders keys are unique and reference the customer range") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.count() == o.select("o_orderkey").distinct().count())
    val maxCust = o.agg(max("o_custkey")).head.getLong(0)
    assert(maxCust <= 150)
  }

  test("customer and part generators produce the expected ranges") {
    val c = SynthData.customer(spark, sf = 0.001)
    assert(c.count() == 150)
    assert(c.filter(col("c_nationkey") < 0 || col("c_nationkey") > 24).isEmpty)
    val p = SynthData.part(spark, sf = 0.001)
    assert(p.count() == 200)
  }

  test("zipf keys are skewed; uniform keys are not") {
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val total = df.count().toDouble
      df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .head.getLong(1) / total
    }
    val z = topShare(SynthData.zipfKeys(spark, 20000, 1000))
    val u = topShare(SynthData.uniformKeys(spark, 20000, 1000))
    assert(z > 4 * u, s"zipf top share $z not ≫ uniform $u")
  }

  test("oracle agrees with Spark on a grouped aggregate over lineitem") {
    // DateType columns trip Spark 4.1's row decoder under collect() in this
    // environment; the oracle ships strings anyway, so cast dates up front.
    val li = SynthData.lineitem(spark, sf = 0.001)
      .withColumn("l_shipdate", col("l_shipdate").cast("string"))
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 4) as "qty")
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       round(SUM(CAST(l_quantity AS DOUBLE)), 4) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle agrees with Spark on a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001)
      .withColumn("o_orderdate", col("o_orderdate").cast("string"))
    val c = SynthData.customer(spark, sf = 0.001)
    val sparkDf = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkDf,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
