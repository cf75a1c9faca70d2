package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators: shape, determinism, and an
  * Oracle-checked aggregation (exercising the DuckDB equivalence path on
  * generic OLAP data).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem shape at SF=0.001") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.length == 10)
  }

  test("orders/customer/part row counts scale with SF") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0005, seed = 5).collect().toSeq
    val b = SynthData.lineitem(spark, 0.0005, seed = 5).collect().toSeq
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, seed = 6)
    val u = SynthData.uniformKeys(spark, 20000, 1000, seed = 6)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }

  test("oracle: grouped aggregate over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.0005).select("l_returnflag", "l_quantity", "l_extendedprice")
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("long").as("cnt"),
        round(sum(col("l_quantity")), 3).as("sum_qty"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_returnflag,
                count(*) AS cnt,
                round(sum(CAST(l_quantity AS DOUBLE)), 3) AS sum_qty
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }

  test("oracle: join between orders and customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.001).select("o_orderkey", "o_custkey", "o_totalprice")
    val c = SynthData.customer(spark, 0.001).select("c_custkey", "c_mktsegment")
    val sparkDf = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).cast("long").as("cnt"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT c_mktsegment, count(*) AS cnt
         FROM orders JOIN customer ON CAST(o_custkey AS DOUBLE) = CAST(c_custkey AS DOUBLE)
         GROUP BY c_mktsegment""",
      "orders" -> o, "customer" -> c)
  }
}
