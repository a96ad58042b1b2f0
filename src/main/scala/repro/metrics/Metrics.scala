package repro.metrics

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.sim.SimResult

/** Converts simulator output into Spark DataFrames and computes the derived
  * metrics the paper's tables report. Aggregations are Spark SQL over these
  * frames and are cross-checked against DuckDB in the test suite.
  */
object Metrics {

  /** Per-second metric rows: sec, throughput, mean_latency_sec,
    * migration_bytes, remote_bytes, backpressured, offered.
    */
  def perSecondDf(spark: SparkSession, r: SimResult): DataFrame = {
    val schema = StructType(Seq(
      StructField("sec", IntegerType),
      StructField("throughput", DoubleType),
      StructField("mean_latency_sec", DoubleType),
      StructField("migration_bytes", DoubleType),
      StructField("remote_bytes", DoubleType),
      StructField("backpressured", DoubleType),
      StructField("offered", DoubleType)))
    val rows = r.perSecond.map(m =>
      Row(m.sec, m.throughput, m.meanLatencySec, m.migrationBytes,
        m.remoteBytes, m.backpressured, m.offered))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toList, 4), schema)
  }

  /** Shard-move protocol log: time_sec, op, inter_node, sync_sec,
    * migrate_sec, bytes.
    */
  def movesDf(spark: SparkSession, r: SimResult): DataFrame = {
    val schema = StructType(Seq(
      StructField("time_sec", DoubleType),
      StructField("op", StringType),
      StructField("inter_node", BooleanType),
      StructField("sync_sec", DoubleType),
      StructField("migrate_sec", DoubleType),
      StructField("bytes", DoubleType)))
    val rows = r.moves.map(m => Row(m.timeSec, m.op, m.interNode, m.syncSec, m.migrateSec, m.bytes))
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toList, 4), schema)
  }

  /** Post-warmup rate summary computed in Spark SQL (same definitions as
    * Table 2): migration and remote-transfer MB/s.
    */
  def rateSummary(spark: SparkSession, r: SimResult, warmupSec: Double): DataFrame = {
    val df = perSecondDf(spark, r).where(col("sec") > warmupSec)
    df.agg(
      (sum("migration_bytes") / count("*") / 1e6) as "migration_mb_per_sec",
      (sum("remote_bytes") / count("*") / 1e6) as "remote_mb_per_sec",
      avg("throughput") as "avg_throughput",
      avg("mean_latency_sec") as "avg_latency_sec")
  }
}
