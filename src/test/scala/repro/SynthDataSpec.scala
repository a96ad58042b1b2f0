package repro

import org.apache.spark.sql.functions._

/** Sanity + oracle checks on the provided TPC-H-lite generators, which feed
  * the Spark-side analytics used throughout the benches.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001, seed = 5)
    val b = SynthData.lineitem(spark, 0.001, seed = 5)
    assert(a.exceptAll(b).isEmpty)
  }

  test("orders keys are dense 1..N") {
    val o = SynthData.orders(spark, 0.001)
    val n = o.count()
    assert(o.agg(min("o_orderkey"), max("o_orderkey")).collect()(0).toSeq == Seq(1L, n))
  }

  test("pricing-summary style aggregate matches DuckDB (TPC-H Q1-lite)") {
    val li = SynthData.lineitem(spark, 0.001).cache()
    val sparkAgg = li.groupBy("l_returnflag", "l_linestatus").agg(
      sum("l_quantity") as "sum_qty",
      count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT l_returnflag, l_linestatus, SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty, " +
        "COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag, l_linestatus",
      "lineitem" -> li)
  }

  test("zipfKeys skews mass; uniformKeys does not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.1)
      .groupBy("k").count().orderBy(desc("count")).collect()
    val u = SynthData.uniformKeys(spark, 20000, 1000)
      .groupBy("k").count().orderBy(desc("count")).collect()
    assert(z.head.getAs[Long]("count") > u.head.getAs[Long]("count") * 3)
  }

  test("join lineitem-orders counts match DuckDB") {
    val li = SynthData.lineitem(spark, 0.0005).cache()
    val o = SynthData.orders(spark, 0.0005).cache()
    val sparkAgg = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT o_orderstatus, COUNT(*) AS n FROM lineitem " +
        "JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT) " +
        "GROUP BY o_orderstatus",
      "lineitem" -> li, "orders" -> o)
  }
}
