package repro

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on
  * plain aggregation/join queries, verifying the oracle harness itself.
  */
class SynthDataSpec extends AnyFunSuite with SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("oracle: grouped aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val q = li.groupBy("l_returnflag").agg(
      count(lit(1)).as("cnt"),
      round(sum("l_quantity"), 2).as("sum_qty"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li.select("l_returnflag", "l_quantity"))
  }

  test("oracle: orders-customer join count matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.002)
    val c = SynthData.customer(spark, sf = 0.002)
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT c_mktsegment, COUNT(*) AS cnt FROM orders o
        |JOIN customer c ON o.o_custkey = c.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o.select("o_custkey"),
      "customer" -> c.select("c_custkey", "c_mktsegment"))
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect()(0).getLong(1)
    assert(topZ > topU * 3, s"zipf top=$topZ uniform top=$topU")
  }
}
