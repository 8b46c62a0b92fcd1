package repro

import org.scalatest.funsuite.AnyFunSuite

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle
  * plumbing end-to-end (this paper is evaluated on graphs, but the oracle
  * harness itself must be trustworthy — see DESIGN.md §7).
  */
class SynthDataOracleSpec extends AnyFunSuite with SparkSpec {

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, 1).collect()
    val b = SynthData.lineitem(spark, 0.001, 1).collect()
    assert(a.sameElements(b))
  }

  test("orders keys are dense 1..N") {
    val keys = SynthData.orders(spark, 0.001).select("o_orderkey").collect().map(_.getLong(0))
    assert(keys.min == 1L && keys.max == keys.length)
  }

  test("oracle: count by returnflag matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.001)
    val out = li.groupBy("l_returnflag").count()
      .selectExpr("l_returnflag", "cast(count as long) as cnt")
    Oracle.assertEquivalent(
      out,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY 1",
      "lineitem" -> li)
  }

  test("oracle: join aggregate matches DuckDB") {
    val orders = SynthData.orders(spark, 0.001)
    val cust = SynthData.customer(spark, 0.001)
    val out = orders.join(cust, orders("o_custkey") === cust("c_custkey"))
      .groupBy("c_mktsegment").count()
      .selectExpr("c_mktsegment", "cast(count as long) as cnt")
    Oracle.assertEquivalent(
      out,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY 1""".stripMargin,
      "orders" -> orders, "customer" -> cust)
  }

  test("zipfKeys produces skew") {
    val df = SynthData.zipfKeys(spark, 5000, 100)
    val top = df.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(1).collect()(0).getLong(1)
    assert(top > 5000 / 100 * 3, s"top=$top") // far above uniform share
  }

  test("uniformKeys covers the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, 5000, 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max < counts.min * 2)
  }
}
