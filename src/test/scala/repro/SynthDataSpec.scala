package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle on
  * query-shaped aggregations (the scaffold's correctness contract).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
    assert(SynthData.orders(spark, sf = 0.001).count() == 1500L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.001, seed = 9).agg(sum("c_acctbal")).first.getDouble(0)
    val b = SynthData.customer(spark, 0.001, seed = 9).agg(sum("c_acctbal")).first.getDouble(0)
    assert(a == b)
  }

  test("lineitem aggregate matches DuckDB (Oracle)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("long").as("cnt"),
           round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag,
        |       count(*)::BIGINT AS cnt,
        |       round(sum(l_quantity::DOUBLE), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("orders/customer join cardinality matches DuckDB (Oracle)") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).cast("long").as("cnt"))
    Oracle.assertEquivalent(
      joined,
      """SELECT c_mktsegment, count(*)::BIGINT AS cnt
        |FROM orders JOIN customer ON o_custkey::BIGINT = c_custkey::BIGINT
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c,
    )
  }

  test("zipfKeys are skewed: top key far above the uniform share") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
    val top = z.groupBy("k").count().orderBy(desc("count")).first.getLong(1)
    assert(top > 5 * 20000 / 1000, s"top key count $top")
  }

  test("uniformKeys cover the key range roughly evenly") {
    val u = SynthData.uniformKeys(spark, 20000, 100)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length >= 95)
    assert(counts.max < 5 * counts.min, s"max=${counts.max} min=${counts.min}")
  }
}
