package repro

import org.apache.spark.sql.functions._

/** Sanity tests for the provided TPC-H-lite generators and the DuckDB oracle
  * wiring (the dedup-similarity suites use the same oracle on string joins).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem generator is deterministic and SF-scaled") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 3)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 3)
    assert(a.count() == 6000)
    assert(a.exceptAll(b).count() == 0)
  }

  test("orders/customer/part generators produce expected row counts") {
    assert(SynthData.orders(spark, sf = 0.001).count() == 1500)
    assert(SynthData.customer(spark, sf = 0.01).count() == 1500)
    assert(SynthData.part(spark, sf = 0.01).count() == 2000)
  }

  test("zipfKeys is skewed, uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > 3 * u, s"zipf top=$z uniform top=$u")
  }

  test("oracle: grouped aggregate over lineitem matches DuckDB") {
    import spark.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001, seed = 3)
    val sparkAgg = li.groupBy($"l_returnflag")
      .agg(count(lit(1)).as("cnt"), sum($"l_linenumber").as("lines"))
    Oracle.assertEquivalent(
      sparkAgg,
      """SELECT l_returnflag, count(1) AS cnt,
        |       SUM(CAST(l_linenumber AS BIGINT)) AS lines
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle: join of orders and customer matches DuckDB") {
    import spark.implicits._
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val sparkJoin = o.join(c, $"o_custkey" === $"c_custkey")
      .groupBy($"c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkJoin,
      """SELECT c_mktsegment, count(1) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("oracle catches a wrong result") {
    import spark.implicits._
    val li = SynthData.lineitem(spark, sf = 0.001, seed = 3)
    val wrong = li.groupBy($"l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt")) // off by one
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, count(1) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
