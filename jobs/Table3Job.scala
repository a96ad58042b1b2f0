package repro.jobs

import repro.experiments.Experiments

/** Reproduces Table 3 (Elasticutor throughput and scheduling time as the
  * cluster grows: 8 / 16 / 32 nodes, SSE application).
  *
  * Run: `sbt "runMain repro.jobs.Table3Job"` or spark-submit with class
  * repro.jobs.Table3Job.
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val nodes = if (args.nonEmpty) args.map(_.toInt).toSeq else Seq(8, 16, 32)
    val rows = Experiments.table3(nodes)
    println(s"== Table 3 (SSE, Elasticutor scalability) ==")
    Experiments.printTable3(rows)
  }
}
