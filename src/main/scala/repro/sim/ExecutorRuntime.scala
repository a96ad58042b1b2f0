package repro.sim

import scala.collection.mutable
import repro.core.ShardMap

/** A batch of tuples that arrived together; the unit of queueing in the
  * fluid simulation. `work` is CPU-seconds, `tuples` the (fractional) tuple
  * count it represents. FIFO draining of cohorts preserves the per-key
  * arrival order the paper's correctness argument relies on.
  */
final class Cohort(val arrivalSec: Double, var work: Double, var tuples: Double)

/** Tuple-weighted latency/throughput accumulator with a log-scale histogram
  * (decade split into 10 buckets) for percentile queries.
  */
final class CompletionStats {
  var tuples: Double = 0.0
  var latencySum: Double = 0.0
  private val hist = new Array[Double](120) // 1 µs .. 1e6 s, log10 buckets ×10

  def record(n: Double, latencySec: Double): Unit = {
    if (n <= 0) return
    tuples += n
    latencySum += n * latencySec
    val l = math.max(latencySec, 1e-6)
    val idx = math.min(hist.length - 1, math.max(0, ((math.log10(l) + 6.0) * 10).toInt))
    hist(idx) += n
  }

  def meanLatency: Double = if (tuples <= 0) 0.0 else latencySum / tuples

  /** Latency at quantile `q` (upper edge of the histogram bucket). */
  def latencyQuantile(q: Double): Double = {
    require(q > 0 && q <= 1, s"quantile out of range: $q")
    if (tuples <= 0) return 0.0
    val target = q * tuples
    var acc = 0.0
    var i = 0
    while (i < hist.length) {
      acc += hist(i)
      if (acc >= target) return math.pow(10, (i + 1) / 10.0 - 6.0)
      i += 1
    }
    math.pow(10, hist.length / 10.0 - 6.0)
  }

  def addFrom(o: CompletionStats): Unit = {
    tuples += o.tuples
    latencySum += o.latencySum
    var i = 0
    while (i < hist.length) { hist(i) += o.hist(i); i += 1 }
  }
}

/** One data-processing thread bound to one CPU core (§3.2). Holds a FIFO
  * pending queue of cohorts; drains one core's worth of work per tick.
  */
final class TaskRuntime(var node: Int) {
  private val queue = mutable.ArrayDeque.empty[Cohort]
  var queuedWork: Double = 0.0
  var queuedTuples: Double = 0.0

  /** Cumulative work ever drained — the labeling-tuple protocol (§3.3)
    * compares against this to know when pre-pause tuples are done.
    */
  var drainedWork: Double = 0.0

  /** Enqueue a cohort, honouring the back-pressure cap: work beyond
    * `maxQueueSec` is refused (the source is throttled). Returns the number
    * of refused tuples.
    */
  def enqueue(c: Cohort, maxQueueSec: Double): Double = {
    if (c.work <= 0) return 0.0
    val room = maxQueueSec - queuedWork
    if (room <= 0) return c.tuples
    if (c.work <= room) {
      queue.append(c)
      queuedWork += c.work
      queuedTuples += c.tuples
      0.0
    } else {
      val frac = room / c.work
      val refused = c.tuples * (1 - frac)
      c.work = room
      c.tuples *= frac
      queue.append(c)
      queuedWork += c.work
      queuedTuples += c.tuples
      refused
    }
  }

  /** Drain up to `capacitySec` of work ending at `nowSec`; completed
    * (fractions of) cohorts are reported to `stats` with their sojourn time
    * and to the caller as the number of completed tuples.
    */
  def drain(capacitySec: Double, nowSec: Double, stats: CompletionStats): Double = {
    var cap = capacitySec
    var completed = 0.0
    while (cap > 1e-12 && queue.nonEmpty) {
      val head = queue.head
      val take = math.min(head.work, cap)
      val frac = take / head.work
      val n = head.tuples * frac
      stats.record(n, math.max(0.0, nowSec - head.arrivalSec))
      completed += n
      head.work -= take
      head.tuples -= n
      queuedWork -= take
      queuedTuples -= n
      drainedWork += take
      cap -= take
      if (head.work <= 1e-12) queue.removeHead()
    }
    if (queuedWork < 0) queuedWork = 0
    if (queuedTuples < 0) queuedTuples = 0
    completed
  }

  def isDrained: Boolean = queuedWork <= 1e-9
}

/** Elasticutor's consistent shard reassignment (§3.3) as a state machine the
  * engine advances each tick:
  *
  *  1. `Draining` — routing for the shard paused (arrivals collect in
  *     `hold`); a labeling tuple waits for the source task to drain
  *     everything that was queued ahead of it.
  *  2. `Migrating` — state bytes cross the network (skipped intra-node
  *     thanks to intra-process state sharing).
  *  3. done — routing table updated, hold buffer flushed to the target.
  */
final class ShardMoveOp(val shard: Int,
                        val fromTask: TaskRuntime,
                        val toTaskIndex: Int,
                        val startSec: Double,
                        val stateBytes: Double,
                        val interNode: Boolean) {
  var phase: Int = ShardMoveOp.Draining
  /** fromTask.drainedWork value at which the labeling tuple is reached. */
  var drainTarget: Double = fromTask.drainedWork + fromTask.queuedWork
  var migrateEndSec: Double = Double.NaN
  var syncEndSec: Double = Double.NaN
  val hold = mutable.ArrayBuffer.empty[Cohort]
}

object ShardMoveOp {
  final val Draining = 0
  final val Migrating = 1
  final val Done = 2
}

/** Record of one completed Elasticutor shard reassignment (Fig. 8/9 data). */
final case class MoveRecord(timeSec: Double,
                            op: String,
                            interNode: Boolean,
                            syncSec: Double,
                            migrateSec: Double,
                            bytes: Double)

/** Record of one RC operator-level key repartitioning (global sync). */
final case class RepartitionRecord(timeSec: Double,
                                   op: String,
                                   shardsMoved: Int,
                                   pauseSec: Double,
                                   drainSec: Double,
                                   routingSec: Double,
                                   migrateSec: Double,
                                   bytes: Double) {
  /** Paper's "synchronization time" per shard: everything except the state
    * transfer itself.
    */
  def syncSec: Double = pauseSec + drainSec + routingSec
}

/** Runtime of one elastic executor (or, for the static/RC paradigms, of one
  * whole operator whose "tasks" are the single-core executors).
  *
  * @param op          operator spec
  * @param execIndex   executor index within the operator
  * @param numShards   tier-2 shard count owned by this runtime
  * @param localNode   node of the main process (receiver/emitter)
  * @param initialTaskNodes node of each initial task
  */
final class ExecutorRuntime(val op: OperatorSpec,
                            val execIndex: Int,
                            val numShards: Int,
                            val localNode: Int,
                            initialTaskNodes: IndexedSeq[Int]) {
  require(initialTaskNodes.nonEmpty, s"executor needs at least one task (${op.name}/$execIndex)")

  val tasks: mutable.ArrayBuffer[TaskRuntime] =
    mutable.ArrayBuffer.from(initialTaskNodes.map(new TaskRuntime(_)))
  val shardMap = new ShardMap(numShards, tasks.length)
  /** Tasks being decommissioned: keep draining until their moves finish. */
  val retiring: mutable.ArrayBuffer[TaskRuntime] = mutable.ArrayBuffer.empty

  /** Current weight (fraction of the operator's input) of each local shard;
    * refreshed by the engine when the key distribution changes.
    */
  val shardWeight: Array[Double] = new Array[Double](numShards)
  /** True while the shard's routing is paused by an in-flight move. */
  val shardPaused: Array[Boolean] = new Array[Boolean](numShards)

  /** Σ weight of unpaused shards per task — the per-tick routing vector. */
  var taskShare: Array[Double] = new Array[Double](tasks.length)

  val activeMoves: mutable.ArrayBuffer[ShardMoveOp] = mutable.ArrayBuffer.empty

  /** Tuples admitted (arrival measurement window for the scheduler). */
  var windowArrivals: Double = 0.0

  def refreshTaskShares(): Unit = {
    val share = new Array[Double](tasks.length)
    var s = 0
    while (s < numShards) {
      if (!shardPaused(s)) {
        val t = shardMap.taskOf(s)
        if (t >= 0 && t < tasks.length) share(t) += shardWeight(s)
      }
      s += 1
    }
    taskShare = share
  }

  /** Total weight share of this executor (paused shards included — they
    * still arrive, just into hold buffers).
    */
  def totalShare: Double = {
    var s = 0.0
    var i = 0
    while (i < numShards) { s += shardWeight(i); i += 1 }
    s
  }

  /** Share arriving via remote tasks (node != localNode): the traffic that
    * crosses receiver/emitter to remote processes (§3.2).
    */
  def remoteShare: Double = {
    var acc = 0.0
    var t = 0
    while (t < tasks.length) {
      if (tasks(t).node != localNode) acc += taskShare(t)
      t += 1
    }
    acc
  }

  /** Per-shard absolute load (CPU-seconds/second) at operator input rate
    * `opRate` — the balancer's workload statistics.
    */
  def shardLoads(opRate: Double): IndexedSeq[Double] = {
    val arr = new Array[Double](numShards)
    var s = 0
    while (s < numShards) { arr(s) = opRate * shardWeight(s) * op.cpuSecPerTuple; s += 1 }
    arr.toIndexedSeq
  }

  def stateBytes: Double = numShards.toDouble * op.statePerShardBytes

  /** Imbalance factor δ over active tasks. */
  def imbalance: Double = {
    if (tasks.isEmpty) return 1.0
    val total = taskShare.sum
    if (total <= 0) 1.0 else taskShare.max / (total / tasks.length)
  }

  /** Cores per node currently held (column of the assignment matrix X). */
  def coresPerNode(numNodes: Int): Array[Int] = {
    val a = new Array[Int](numNodes)
    tasks.foreach(t => a(t.node) += 1)
    a
  }
}
