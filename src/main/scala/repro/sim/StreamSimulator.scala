package repro.sim

import scala.collection.mutable
import repro.core.{CpuAssignment, DynamicScheduler, LoadBalancer, QueueingModel}

/** Which execution paradigm (§2.2) the simulated system runs. */
sealed trait Paradigm
object Paradigm {
  /** Storm default: one core per executor, static key partition, no elasticity. */
  case object Static extends Paradigm

  /** Resource-centric: single-core executors; elasticity via operator-level
    * key repartitioning with global synchronization (pause all upstream,
    * drain in-flight, migrate state, update upstream routing tables).
    */
  final case class ResourceCentric(checkPeriodSec: Double = 1.0) extends Paradigm

  /** Executor-centric (Elasticutor): y elastic executors per operator, each
    * owning a static key subspace of z shards; cores assigned dynamically by
    * the model-based scheduler; intra-executor load balancing.
    * `naive` disables migration-cost/locality optimisation (naive-EC, §5.4).
    */
  final case class ExecutorCentric(schedulePeriodSec: Double = 1.0,
                                   balancePeriodSec: Double = 0.25,
                                   naive: Boolean = false) extends Paradigm
}

/** Full configuration of one simulation run.
  *
  * Defaults mirror §5: 32 executors/operator × 256 shards/executor = 8192
  * shards per operator (the same repartitioning granularity is used for the
  * static/RC paradigms), θ = 1.2, φ̃ = 512 KB/s.
  */
final case class SimConfig(cluster: ClusterSpec,
                           paradigm: Paradigm,
                           executorsPerOp: Int = 32,
                           shardsPerExecutor: Int = 256,
                           executorsPerOpOverride: Map[String, Int] = Map.empty,
                           tickSec: Double = 1e-3,
                           durationSec: Double = 60.0,
                           warmupSec: Double = 5.0,
                           maxQueueSec: Double = 4.0,
                           latencyTargetSec: Double = 0.05,
                           theta: Double = 1.2,
                           phi0: Double = 512.0 * 1024) {
  require(tickSec > 0 && durationSec > tickSec, "bad tick/duration")
  require(warmupSec >= 0 && warmupSec < durationSec, "warmup must fit in duration")
  def executorsOf(op: String): Int = executorsPerOpOverride.getOrElse(op, executorsPerOp)
}

/** One second of aggregated simulation metrics. */
final case class SecondMetric(sec: Int,
                              throughput: Double,
                              meanLatencySec: Double,
                              migrationBytes: Double,
                              remoteBytes: Double,
                              backpressured: Double,
                              offered: Double)

/** Everything a bench needs from one run. Post-warmup aggregates plus the
  * full per-second series and per-operation protocol logs.
  */
final class SimResult(val perSecond: IndexedSeq[SecondMetric],
                      val moves: IndexedSeq[MoveRecord],
                      val repartitions: IndexedSeq[RepartitionRecord],
                      val schedulerMillis: IndexedSeq[Double],
                      val entryStats: CompletionStats,
                      val allOpsLatencySum: Double,
                      val totalMigrationBytes: Double,
                      val totalRemoteBytes: Double,
                      val measuredSec: Double) {
  /** Mean post-warmup throughput, tuples/s of the entry operator. */
  def throughput: Double = entryStats.tuples / measuredSec
  /** End-to-end mean latency per Eq. (1): Σ_ops λ_j E[T_j] / λ_0. */
  def meanLatencySec: Double =
    if (entryStats.tuples <= 0) 0.0 else allOpsLatencySum / entryStats.tuples
  /** 99th-percentile sojourn latency at the entry operator. */
  def p99LatencySec: Double = entryStats.latencyQuantile(0.99)
  def migrationRateBytesPerSec: Double = totalMigrationBytes / measuredSec
  def remoteRateBytesPerSec: Double = totalRemoteBytes / measuredSec
}

/** Discrete-time fluid simulator of a stream-processing cluster running one
  * of the three paradigms over a dynamic keyed workload. See DESIGN.md §6
  * for the fidelity argument.
  */
final class StreamSimulator(config: SimConfig, workload: Workload) {
  private val cluster = config.cluster
  private val ops = workload.operators
  private val opIdx: Map[String, Int] = ops.map(_.name).zipWithIndex.toMap
  require(opIdx.contains(workload.throughputOp), s"unknown throughput op ${workload.throughputOp}")
  private val entryOp = opIdx(workload.throughputOp)
  private val numNodes = cluster.numNodes

  private val isEC = config.paradigm.isInstanceOf[Paradigm.ExecutorCentric]

  // ---- executor layout -----------------------------------------------------

  /** Per op: its executor runtimes (EC: y of them; static/RC: exactly one
    * whose tasks are the operator's single-core executors).
    */
  private val execs: IndexedSeq[IndexedSeq[ExecutorRuntime]] = buildLayout()
  private val allExecs: IndexedSeq[ExecutorRuntime] = execs.flatten
  /** Numbers of executors (tier-1 partitions) and shards per executor used
    * for the shard-weight aggregation; identical totals in all paradigms so
    * repartitioning granularity is comparable (§5 setup).
    */
  private def tier1Of(op: Int): (Int, Int) =
    if (isEC) (config.executorsOf(ops(op).name), config.shardsPerExecutor)
    else (1, config.executorsOf(ops(op).name) * config.shardsPerExecutor)

  /** Steady-state input rate per op at t=0, used to size static allocations. */
  private def steadyRates(t: Double): Array[Double] = {
    val r = new Array[Double](ops.length)
    for (j <- ops.indices) {
      r(j) += workload.externalRate(ops(j).name, t)
      for ((d, sel) <- ops(j).downstream) r(opIdx(d)) += r(j) * sel
    }
    r
  }

  private def buildLayout(): IndexedSeq[IndexedSeq[ExecutorRuntime]] = {
    config.paradigm match {
      case Paradigm.ExecutorCentric(_, _, _) =>
        var node = 0
        val out = for (j <- ops.indices) yield {
          val y = config.executorsOf(ops(j).name)
          val (_, z) = tier1Of(j)
          for (e <- 0 until y) yield {
            val local = node % numNodes
            node += 1
            new ExecutorRuntime(ops(j), e, z, local, IndexedSeq(local))
          }
        }
        val totalExecs = out.map(_.length).sum
        require(totalExecs <= cluster.totalCores,
          s"$totalExecs executors need at least that many cores; cluster has ${cluster.totalCores}")
        out
      case _ =>
        // Static/RC: allocate all cores across operators proportionally to
        // their steady CPU demand ("enough executors to fully utilize all
        // CPU cores", §5); executors are placed round-robin across nodes.
        val rates = steadyRates(0.0)
        val demand = ops.indices.map(j => math.max(rates(j) * ops(j).cpuSecPerTuple, 1e-9))
        val total = demand.sum
        val cores = ops.indices.map(j =>
          math.max(1, math.round(cluster.totalCores * demand(j) / total).toInt)).toArray
        // Trim rounding overflow from the biggest allocations.
        var excess = cores.sum - cluster.totalCores
        while (excess > 0) {
          val j = cores.indices.maxBy(cores)
          if (cores(j) > 1) { cores(j) -= 1; excess -= 1 } else excess = 0
        }
        var node = 0
        for (j <- ops.indices) yield {
          val (_, z) = tier1Of(j)
          val nodes = (0 until cores(j)).map { _ => val n = node % numNodes; node += 1; n }
          val rt = new ExecutorRuntime(ops(j), 0, z, nodes.head, nodes)
          // Static key partition: shard s -> task s mod T.
          rt.shardMap.replaceAll((0 until z).map(_ % cores(j)))
          IndexedSeq(rt)
        }
    }
  }

  // ---- per-run mutable state ----------------------------------------------

  private val secMetrics = mutable.ArrayBuffer.empty[SecondMetric]
  private val moveLog = mutable.ArrayBuffer.empty[MoveRecord]
  private val repartLog = mutable.ArrayBuffer.empty[RepartitionRecord]
  private val schedMillis = mutable.ArrayBuffer.empty[Double]

  private val cumEntry = new CompletionStats
  private var cumAllLatency = 0.0
  private var cumMigrationBytes = 0.0
  private var cumRemoteBytes = 0.0

  /** RC repartition in flight, per op. */
  private final class RepartitionOp(val op: Int, val startSec: Double,
                                    val moves: List[LoadBalancer.Move],
                                    val targetAssignment: IndexedSeq[Int]) {
    var phase = 0 // 0 pause, 1 drain, 2 transfer, 3 done
    var pauseEndSec: Double = startSec + cluster.controlRttSec
    var drainEndSec: Double = Double.NaN
    var transferEndSec: Double = Double.NaN
    var routingSec: Double = Double.NaN
    var migrateSec: Double = Double.NaN
    var bytes: Double = 0.0
    val hold = mutable.ArrayBuffer.empty[Cohort]
  }
  private val activeReparts: Array[RepartitionOp] = new Array[RepartitionOp](ops.length)

  /** Append into a hold buffer, merging cohorts within 10 ms so long pauses
    * don't accumulate unbounded cohort objects.
    */
  private def appendHold(hold: mutable.ArrayBuffer[Cohort], now: Double, work: Double, tuples: Double): Unit = {
    if (work <= 0) return
    if (hold.nonEmpty && now - hold.last.arrivalSec < 0.010) {
      hold.last.work += work
      hold.last.tuples += tuples
    } else hold += new Cohort(now, work, tuples)
  }

  // ---- weight refresh ------------------------------------------------------

  private def refreshWeights(): Unit = {
    for (j <- ops.indices) {
      val (y, z) = tier1Of(j)
      val w = workload.shardWeights(ops(j).name, y, z)
      val perOp = execs(j)
      for (e <- perOp.indices) {
        val rt = perOp(e)
        System.arraycopy(w, e * z, rt.shardWeight, 0, z)
        rt.refreshTaskShares()
      }
    }
  }

  // ---- Elasticutor shard moves --------------------------------------------

  private def startMove(rt: ExecutorRuntime, shard: Int, fromTask: TaskRuntime, toTask: Int): Unit = {
    val interNode = fromTask.node != rt.tasks(toTask).node
    rt.shardPaused(shard) = true
    rt.activeMoves += new ShardMoveOp(shard, fromTask, toTask, currentSec,
      rt.op.statePerShardBytes, interNode)
  }

  private var currentSec: Double = 0.0

  private def advanceMoves(rt: ExecutorRuntime): Unit = {
    if (rt.activeMoves.isEmpty) return
    var changed = false
    var i = 0
    while (i < rt.activeMoves.length) {
      val m = rt.activeMoves(i)
      m.phase match {
        case ShardMoveOp.Draining =>
          if (m.fromTask.drainedWork + 1e-9 >= m.drainTarget) {
            m.syncEndSec = currentSec + cluster.shardSyncOverheadSec
            m.migrateEndSec = m.syncEndSec +
              (if (m.interNode) cluster.transferSec(m.stateBytes) else 0.0)
            m.phase = ShardMoveOp.Migrating
          }
        case ShardMoveOp.Migrating =>
          if (currentSec >= m.migrateEndSec) {
            rt.shardMap.reassign(m.shard, m.toTaskIndex)
            rt.shardPaused(m.shard) = false
            val dst = rt.tasks(m.toTaskIndex)
            m.hold.foreach(c => secBackpressured += dst.enqueue(c, config.maxQueueSec))
            val bytes = if (m.interNode) m.stateBytes else 0.0
            if (m.interNode) { secMigrationBytes += bytes }
            moveLog += MoveRecord(m.startSec, rt.op.name, m.interNode,
              m.syncEndSec - m.startSec, m.migrateEndSec - m.syncEndSec, bytes)
            m.phase = ShardMoveOp.Done
            changed = true
          }
        case _ => ()
      }
      i += 1
    }
    if (changed) {
      rt.activeMoves.filterInPlace(_.phase != ShardMoveOp.Done)
      // Retired tasks whose shards have all left and queues drained free up.
      rt.retiring.filterInPlace(t => !(t.isDrained &&
        rt.activeMoves.forall(_.fromTask ne t)))
      rt.refreshTaskShares()
    }
  }

  // ---- scheduler (EC) ------------------------------------------------------

  private def runScheduler(naive: Boolean, periodSec: Double): Unit = {
    // λ is inflated by θ: the M/M/k model pools an executor's cores into one
    // queue, but real tasks tolerate up to θ× the mean load (§3.1), so the
    // hottest task needs θ·λ/k < μ — provisioning for θλ guarantees it.
    val loads = allExecs.map { rt =>
      val lambda = rt.windowArrivals / periodSec * config.theta
      QueueingModel.ExecutorLoad(lambda, 1.0 / rt.op.cpuSecPerTuple)
    }
    val infos = allExecs.map { rt =>
      val cores = math.max(1, rt.tasks.length)
      val lambda = rt.windowArrivals / periodSec
      CpuAssignment.ExecutorInfo(rt.localNode, rt.stateBytes,
        lambda * (rt.op.tupleBytes + rt.op.outBytes) / cores)
    }
    allExecs.foreach(_.windowArrivals = 0.0)
    val prev = CpuAssignment.Assignment(
      IndexedSeq.tabulate(numNodes)(i => allExecs.map(_.coresPerNode(numNodes)(i)).toIndexedSeq))
    val capacity = IndexedSeq.fill(numNodes)(cluster.coresPerNode)
    val decision =
      if (naive) DynamicScheduler.scheduleNaive(loads, infos, prev, capacity, config.latencyTargetSec)
      else DynamicScheduler.schedule(loads, infos, prev, capacity, config.latencyTargetSec, config.phi0)
    schedMillis += decision.wallClockMillis
    decision.assignment.foreach { a =>
      for (j <- allExecs.indices) {
        val counts = Array.tabulate(numNodes)(i => a.cores(i)(j))
        applyAssignment(allExecs(j), counts)
      }
    }
  }

  /** Install a new per-node core count vector on one executor: diff against
    * current tasks, retire/add tasks, and launch the shard moves that
    * rebalance onto the new task set.
    */
  private def applyAssignment(rt: ExecutorRuntime, newCounts: Array[Int]): Unit = {
    if (rt.activeMoves.nonEmpty || rt.retiring.nonEmpty) return
    val cur = rt.coresPerNode(numNodes)
    if (java.util.Arrays.equals(cur, newCounts)) return
    if (newCounts.sum == 0) return // never strip the last core

    val survivors = mutable.ArrayBuffer.empty[TaskRuntime]
    val removed = mutable.ArrayBuffer.empty[TaskRuntime]
    for (node <- 0 until numNodes) {
      val onNode = rt.tasks.filter(_.node == node)
      val keep = math.min(onNode.length, newCounts(node))
      survivors ++= onNode.take(keep)
      removed ++= onNode.drop(keep)
    }
    val added = mutable.ArrayBuffer.empty[TaskRuntime]
    for (node <- 0 until numNodes) {
      val have = survivors.count(_.node == node)
      for (_ <- have until newCounts(node)) added += new TaskRuntime(node)
    }
    val newTasks = survivors ++ added
    val newIndex: Map[TaskRuntime, Int] = newTasks.zipWithIndex.toMap

    val opRate = lastOpRate(opIdx(rt.op.name))
    val loads = rt.shardLoads(opRate)
    // Base assignment: survivors keep their shards; orphans (on removed
    // tasks) go FFD onto the least-loaded new task, each via the protocol.
    val base = new Array[Int](rt.numShards)
    val orphans = mutable.ArrayBuffer.empty[Int]
    val oldTaskOf = new Array[TaskRuntime](rt.numShards)
    for (s <- 0 until rt.numShards) {
      val t = rt.tasks(rt.shardMap.taskOf(s))
      oldTaskOf(s) = t
      newIndex.get(t) match {
        case Some(ni) => base(s) = ni
        case None => base(s) = -1; orphans += s
      }
    }
    val taskLoad = new Array[Double](newTasks.length)
    for (s <- 0 until rt.numShards if base(s) >= 0) taskLoad(base(s)) += loads(s)
    val forced = mutable.ArrayBuffer.empty[(Int, TaskRuntime, Int)]
    for (s <- orphans.sortBy(s => -loads(s))) {
      val dst = taskLoad.indices.minBy(taskLoad)
      base(s) = dst
      taskLoad(dst) += loads(s)
      forced += ((s, oldTaskOf(s), dst))
    }
    val reb = LoadBalancer.rebalance(loads, base.toIndexedSeq, newTasks.length, config.theta)

    // Install the new task set and the renumbered map (renumbering survivor
    // indices is pure bookkeeping, not a migration).
    rt.tasks.clear(); rt.tasks ++= newTasks
    rt.retiring ++= removed
    rt.shardMap.replaceAll(base.toIndexedSeq)
    for ((s, from, dst) <- forced) startMove(rt, s, from, dst)
    for (m <- LoadBalancer.collapse(reb.moves) if !rt.shardPaused(m.shard))
      startMove(rt, m.shard, rt.tasks(m.fromTask), m.toTask)
    rt.refreshTaskShares()
  }

  /** Periodic intra-executor balance check (EC). */
  private def maybeRebalance(rt: ExecutorRuntime, opRate: Double): Unit = {
    if (rt.activeMoves.nonEmpty || rt.tasks.length < 2) return
    if (rt.imbalance <= config.theta) return
    val loads = rt.shardLoads(opRate)
    val reb = LoadBalancer.rebalance(loads, rt.shardMap.snapshot, rt.tasks.length, config.theta)
    for (m <- LoadBalancer.collapse(reb.moves)) startMove(rt, m.shard, rt.tasks(m.fromTask), m.toTask)
    rt.refreshTaskShares()
  }

  // ---- RC repartitioning ---------------------------------------------------

  private def maybeRepartition(op: Int, opRate: Double): Unit = {
    val rt = execs(op).head
    if (activeReparts(op) != null || rt.tasks.length < 2) return
    if (rt.imbalance <= config.theta) return
    val loads = rt.shardLoads(opRate)
    val reb = LoadBalancer.rebalance(loads, rt.shardMap.snapshot, rt.tasks.length, config.theta)
    if (reb.moves.isEmpty) return
    activeReparts(op) = new RepartitionOp(op, currentSec, reb.moves, reb.assignment)
  }

  private def advanceRepartition(op: Int): Unit = {
    val r = activeReparts(op)
    if (r == null) return
    val rt = execs(op).head
    r.phase match {
      case 0 =>
        if (currentSec >= r.pauseEndSec) r.phase = 1
      case 1 =>
        if (rt.tasks.forall(_.isDrained)) {
          r.drainEndSec = currentSec
          val crossBytes = r.moves.iterator
            .filter(m => rt.tasks(m.fromTask).node != rt.tasks(m.toTask).node)
            .map(_ => rt.op.statePerShardBytes).sum
          r.bytes = crossBytes
          // Each shard pays the reassignment control overhead (the moves are
          // applied shard-by-shard to keep per-key order), plus the network
          // transfer of cross-node state.
          r.migrateSec = r.moves.length * cluster.shardSyncOverheadSec +
            cluster.transferSec(crossBytes)
          // Routing tables of every upstream executor are updated while the
          // operator is paused: a request+ack round trip each, serialized
          // through the controller — the global synchronization the
          // executor-centric approach avoids (§3.3).
          r.routingSec = 2 * cluster.controlRttSec * workload.upstreamExecutorCount
          r.transferEndSec = currentSec + r.migrateSec + r.routingSec
          r.phase = 2
        }
      case 2 =>
        if (currentSec >= r.transferEndSec) {
          rt.shardMap.replaceAll(r.targetAssignment)
          rt.refreshTaskShares()
          // Flush held input proportionally to the new task shares.
          val shares = rt.taskShare
          val total = math.max(shares.sum, 1e-12)
          for (c <- r.hold; t <- rt.tasks.indices) {
            val f = shares(t) / total
            if (f > 0) {
              val piece = new Cohort(c.arrivalSec, c.work * f, c.tuples * f)
              secBackpressured += rt.tasks(t).enqueue(piece, config.maxQueueSec)
            }
          }
          secMigrationBytes += r.bytes
          repartLog += RepartitionRecord(r.startSec, rt.op.name, r.moves.length,
            r.pauseEndSec - r.startSec, r.drainEndSec - r.pauseEndSec,
            r.routingSec, r.migrateSec, r.bytes)
          activeReparts(op) = null
        }
      case _ => ()
    }
  }

  /** Warm start (t = 0): provision executors for the steady-state rates
    * using the real scheduler, installing tasks and balanced shard maps
    * directly — no protocol, no cost. The paper's measurements likewise
    * start from a provisioned steady state; without this, the 1-core
    * bootstrap builds a backlog that a fully-utilised cluster can never
    * drain, polluting every latency figure.
    */
  private def initialProvision(): Unit = {
    val rates = steadyRates(0.0)
    config.paradigm match {
      case Paradigm.ExecutorCentric(_, _, naive) =>
        val loads = allExecs.map { rt =>
          val j = opIdx(rt.op.name)
          QueueingModel.ExecutorLoad(rates(j) * rt.totalShare * config.theta, 1.0 / rt.op.cpuSecPerTuple)
        }
        val infos = allExecs.map { rt =>
          val j = opIdx(rt.op.name)
          CpuAssignment.ExecutorInfo(rt.localNode, rt.stateBytes,
            rates(j) * rt.totalShare * (rt.op.tupleBytes + rt.op.outBytes))
        }
        val prev = CpuAssignment.Assignment(
          IndexedSeq.tabulate(numNodes)(i => allExecs.map(_.coresPerNode(numNodes)(i)).toIndexedSeq))
        val capacity = IndexedSeq.fill(numNodes)(cluster.coresPerNode)
        val decision =
          if (naive) DynamicScheduler.scheduleNaive(loads, infos, prev, capacity, config.latencyTargetSec)
          else DynamicScheduler.schedule(loads, infos, prev, capacity, config.latencyTargetSec, config.phi0)
        decision.assignment.foreach { a =>
          for (j <- allExecs.indices) {
            val rt = allExecs(j)
            val nodes = (0 until numNodes).flatMap(i => Seq.fill(a.cores(i)(j))(i))
            if (nodes.nonEmpty && nodes.length != rt.tasks.length) {
              rt.tasks.clear()
              rt.tasks ++= nodes.map(new TaskRuntime(_))
            }
            installBalancedMap(rt, rates(opIdx(rt.op.name)))
          }
        }
      case _ =>
        // RC (and static's hash partition is already installed): start from
        // a balanced shard map — RC systems rebalance on deploy.
        config.paradigm match {
          case Paradigm.ResourceCentric(_) =>
            for (j <- ops.indices) installBalancedMap(execs(j).head, rates(j))
          case _ => ()
        }
    }
  }

  /** Replace an executor's shard map with a freshly balanced one, free of
    * protocol cost (only valid before the clock starts).
    */
  private def installBalancedMap(rt: ExecutorRuntime, opRate: Double): Unit = {
    val loads = rt.shardLoads(opRate)
    val rr = IndexedSeq.tabulate(rt.numShards)(_ % rt.tasks.length)
    val reb = LoadBalancer.rebalance(loads, rr, rt.tasks.length, config.theta)
    rt.shardMap.replaceAll(reb.assignment)
    rt.refreshTaskShares()
  }

  // ---- main loop -----------------------------------------------------------

  private var secMigrationBytes = 0.0
  private var secRemoteBytes = 0.0
  private var secBackpressured = 0.0
  private var secOffered = 0.0
  private val lastOpRate = new Array[Double](ops.length)

  /** Run the simulation and return aggregated results. */
  def run(): SimResult = {
    val dt = config.tickSec
    val steps = math.round(config.durationSec / dt).toInt
    val secStats = Array.fill(ops.length)(new CompletionStats)
    val internalRate = new Array[Double](ops.length)
    var nextSecond = 1.0
    var lastBalance = 0.0
    var lastSchedule = 0.0
    var lastRcCheck = 0.0

    refreshWeights()
    initialProvision()

    var step = 0
    while (step < steps) {
      val now = step * dt
      currentSec = now
      // A detected distribution change triggers an immediate balance check
      // (metrics monitoring is continuous in the real system); without it,
      // queues build for up to a full check period first.
      val shuffled = workload.advanceTo(now)
      if (shuffled) refreshWeights()

      // Input rates: external plus internal emissions from the previous tick.
      val rates = new Array[Double](ops.length)
      for (j <- ops.indices)
        rates(j) = workload.externalRate(ops(j).name, now) + internalRate(j)
      System.arraycopy(rates, 0, lastOpRate, 0, ops.length)
      secOffered += rates(entryOp) * dt

      // Arrivals.
      for (j <- ops.indices) {
        val repart = activeReparts(j)
        if (repart != null && repart.phase < 3) {
          // RC pause: everything destined for this operator buffers.
          appendHold(repart.hold, now, rates(j) * dt * ops(j).cpuSecPerTuple, rates(j) * dt)
        } else {
          val perOp = execs(j)
          var e = 0
          while (e < perOp.length) {
            val rt = perOp(e)
            val execTuples = rates(j) * rt.totalShare * dt
            rt.windowArrivals += execTuples
            // Remote NIC cap (EC only): receiver forwards at most one NIC's
            // worth of bytes to remote tasks per tick.
            var remoteScale = 1.0
            if (isEC) {
              val rs = rt.remoteShare
              if (rs > 0) {
                val demand = rates(j) * rs * dt * (rt.op.tupleBytes + rt.op.outBytes)
                val budget = cluster.networkBytesPerSec * dt
                if (demand > budget) remoteScale = budget / demand
                secRemoteBytes += math.min(demand, budget)
              }
            }
            var t = 0
            while (t < rt.tasks.length) {
              val share = rt.taskShare(t)
              if (share > 0) {
                val remote = isEC && rt.tasks(t).node != rt.localNode
                val scale = if (remote) remoteScale else 1.0
                val tuples = rates(j) * share * dt * scale
                if (remote && remoteScale < 1.0)
                  secBackpressured += rates(j) * share * dt * (1 - remoteScale)
                if (tuples > 0) {
                  val c = new Cohort(now, tuples * ops(j).cpuSecPerTuple, tuples)
                  secBackpressured += rt.tasks(t).enqueue(c, config.maxQueueSec)
                }
              }
              t += 1
            }
            // Paused shards: buffer at the move's hold.
            if (rt.activeMoves.nonEmpty) {
              var i = 0
              while (i < rt.activeMoves.length) {
                val m = rt.activeMoves(i)
                val w = rt.shardWeight(m.shard)
                if (w > 0)
                  appendHold(m.hold, now, rates(j) * w * dt * ops(j).cpuSecPerTuple, rates(j) * w * dt)
                i += 1
              }
            }
            e += 1
          }
        }
      }

      // Service. A node can only supply coresPerNode core-ticks: when task
      // churn transiently oversubscribes a node (retiring tasks still
      // draining), every busy task on it gets a proportional share.
      val endOfTick = now + dt
      java.util.Arrays.fill(internalRate, 0.0)
      val busyOnNode = new Array[Int](numNodes)
      for (j <- ops.indices; rt <- execs(j)) {
        rt.tasks.foreach(t => if (t.queuedWork > 0) busyOnNode(t.node) += 1)
        rt.retiring.foreach(t => if (t.queuedWork > 0) busyOnNode(t.node) += 1)
      }
      def capacityOf(t: TaskRuntime): Double =
        if (busyOnNode(t.node) <= cluster.coresPerNode) dt
        else dt * cluster.coresPerNode / busyOnNode(t.node)
      for (j <- ops.indices) {
        val perOp = execs(j)
        var completed = 0.0
        var e = 0
        while (e < perOp.length) {
          val rt = perOp(e)
          var t = 0
          while (t < rt.tasks.length) {
            completed += rt.tasks(t).drain(capacityOf(rt.tasks(t)), endOfTick, secStats(j))
            t += 1
          }
          t = 0
          while (t < rt.retiring.length) {
            completed += rt.retiring(t).drain(capacityOf(rt.retiring(t)), endOfTick, secStats(j))
            t += 1
          }
          e += 1
        }
        for ((d, sel) <- ops(j).downstream) internalRate(opIdx(d)) += completed * sel / dt
      }

      // Protocol state machines.
      for (j <- ops.indices) {
        if (isEC) execs(j).foreach(advanceMoves) else advanceRepartition(j)
      }

      // Periodic controllers.
      config.paradigm match {
        case Paradigm.ExecutorCentric(schedPeriod, balPeriod, naive) =>
          if (shuffled || now - lastBalance >= balPeriod) {
            lastBalance = now
            for (j <- ops.indices; rt <- execs(j)) maybeRebalance(rt, rates(j))
          }
          if (now - lastSchedule >= schedPeriod && now > 0) {
            lastSchedule = now
            runScheduler(naive, schedPeriod)
          }
        case Paradigm.ResourceCentric(period) =>
          // RC's controller aggregates operator-level metrics globally; it
          // reacts on its periodic cadence, not instantly on a shuffle —
          // queues build in the hot executors until the check fires, and
          // draining them is part of the global synchronization.
          if (now - lastRcCheck >= period) {
            lastRcCheck = now
            for (j <- ops.indices) maybeRepartition(j, rates(j))
          }
        case Paradigm.Static => ()
      }

      // Per-second metric rollover.
      if (endOfTick + 1e-9 >= nextSecond) {
        val entry = secStats(entryOp)
        val allLat = secStats.map(_.latencySum).sum
        val mean = if (entry.tuples > 0) allLat / entry.tuples else 0.0
        secMetrics += SecondMetric(nextSecond.toInt, entry.tuples, mean,
          secMigrationBytes, secRemoteBytes, secBackpressured, secOffered)
        if (nextSecond > config.warmupSec) {
          cumEntry.addFrom(entry)
          cumAllLatency += allLat
          cumMigrationBytes += secMigrationBytes
          cumRemoteBytes += secRemoteBytes
        }
        for (j <- ops.indices) secStats(j) = new CompletionStats
        secMigrationBytes = 0; secRemoteBytes = 0; secBackpressured = 0; secOffered = 0
        nextSecond += 1.0
      }
      step += 1
    }

    new SimResult(secMetrics.toIndexedSeq, moveLog.toIndexedSeq, repartLog.toIndexedSeq,
      schedMillis.toIndexedSeq, cumEntry, cumAllLatency, cumMigrationBytes, cumRemoteBytes,
      math.max(config.durationSec - config.warmupSec, 1e-9))
  }

  /** Expose layout for tests: (op name, executors, tasks each). */
  def layout: IndexedSeq[(String, Int, IndexedSeq[Int])] =
    ops.indices.map(j => (ops(j).name, execs(j).length, execs(j).map(_.tasks.length)))
}
