package repro.metrics

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.sim._
import repro.workload.MicroBenchWorkload

/** Simulator metrics land in DataFrames; the SQL aggregations that produce
  * the tables are cross-checked against DuckDB.
  */
class MetricsSpec extends SparkSpec {

  private lazy val result: SimResult = {
    val cluster = ClusterSpec(2, 8)
    val cfg = SimConfig(cluster, Paradigm.ExecutorCentric(), executorsPerOp = 4,
      shardsPerExecutor = 16, executorsPerOpOverride = Map("sink" -> 2),
      durationSec = 20, warmupSec = 5)
    new StreamSimulator(cfg, new MicroBenchWorkload(6000, 4, zipfSkew = 1.0)).run()
  }

  test("perSecondDf has one row per simulated second") {
    val df = Metrics.perSecondDf(spark, result)
    assert(df.count() == 20)
    assert(df.columns.toSet == Set("sec", "throughput", "mean_latency_sec",
      "migration_bytes", "remote_bytes", "backpressured", "offered"))
  }

  test("movesDf mirrors the move log") {
    val df = Metrics.movesDf(spark, result)
    assert(df.count() == result.moves.length)
    assert(df.where(col("sync_sec") < 0).isEmpty)
  }

  test("post-warmup throughput in SQL matches SimResult aggregate") {
    val df = Metrics.perSecondDf(spark, result).where(col("sec") > 5)
    val sqlThr = df.agg(avg("throughput")).collect()(0).getDouble(0)
    assert(math.abs(sqlThr - result.throughput) < 1.0, s"sql=$sqlThr agg=${result.throughput}")
  }

  test("rate summary matches DuckDB over the same rows") {
    val perSec = Metrics.perSecondDf(spark, result)
    val sparkAgg = perSec.where(col("sec") > 5).agg(
      (sum("migration_bytes") / count(lit(1)) / 1e6) as "migration_mb_per_sec",
      (sum("remote_bytes") / count(lit(1)) / 1e6) as "remote_mb_per_sec")
    // Oracle ingests columns as VARCHAR; cast explicitly on the DuckDB side.
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT SUM(CAST(migration_bytes AS DOUBLE))/COUNT(*)/1e6 AS migration_mb_per_sec, " +
        "SUM(CAST(remote_bytes AS DOUBLE))/COUNT(*)/1e6 AS remote_mb_per_sec " +
        "FROM per_sec WHERE CAST(sec AS INT) > 5",
      "per_sec" -> perSec)
  }

  test("per-second moves aggregation matches DuckDB") {
    val moves = Metrics.movesDf(spark, result)
    if (result.moves.nonEmpty) {
      val sparkAgg = moves.groupBy("inter_node").agg(
        count(lit(1)) as "n",
        sum("bytes") as "total_bytes")
      Oracle.assertEquivalent(
        sparkAgg,
        "SELECT CAST(inter_node AS BOOLEAN) AS inter_node, COUNT(*) AS n, " +
          "SUM(CAST(bytes AS DOUBLE)) AS total_bytes FROM moves GROUP BY 1",
        "moves" -> moves)
    }
  }

  test("rateSummary exposes the Table 2 metric definitions") {
    val row = Metrics.rateSummary(spark, result, warmupSec = 5).collect()(0)
    assert(row.getAs[Double]("migration_mb_per_sec") >= 0)
    assert(row.getAs[Double]("remote_mb_per_sec") >= 0)
    assert(row.getAs[Double]("avg_throughput") > 0)
  }

  test("SweepDriver runs points on the Spark cluster and labels them") {
    val df = SweepDriver.sweep(spark, Seq(("a", 1.0), ("b", 2.0)), { case (label, p) =>
      SweepDriver.SweepRow(label, p, p * 100, 0.01, 0.02, 0.0, 0.0)
    })
    val rows = df.orderBy("label").collect()
    assert(rows.map(_.getAs[String]("label")).toSeq == Seq("a", "b"))
    assert(rows.map(_.getAs[Double]("throughput")).toSeq == Seq(100.0, 200.0))
  }

  test("SweepDriver.summarize lifts a SimResult") {
    val s = SweepDriver.summarize("x", 3.0, result)
    assert(s.label == "x" && s.param == 3.0)
    assert(s.throughput == result.throughput)
    assert(s.migrationMBps == result.migrationRateBytesPerSec / 1e6)
  }
}
