package repro.jobs

import repro.experiments.Experiments

/** Reproduces Table 2 (naive-EC vs Elasticutor: state-migration and
  * remote-data-transfer rates on the SSE application, 32 nodes).
  *
  * Run: `spark-submit --class repro.jobs.Table2Job <jar>` — or
  * `sbt "runMain repro.jobs.Table2Job"`. The simulation itself is
  * single-JVM; Spark is used by the bench variants for sweep fan-out.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val nodes = if (args.nonEmpty) args(0).toInt else 32
    val rows = Experiments.table2(nodes)
    println(s"== Table 2 (SSE, $nodes nodes) ==")
    Experiments.printTable2(rows)
    rows.foreach(r => println(
      f"  ${r.approach}%-12s throughput=${r.throughput}%10.0f t/s  latency=${r.meanLatencySec * 1e3}%8.1f ms"))
  }
}
