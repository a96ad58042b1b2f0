package repro.sim

import org.scalatest.funsuite.AnyFunSuite

class TaskRuntimeSpec extends AnyFunSuite {

  test("enqueue accumulates work and tuples") {
    val t = new TaskRuntime(0)
    assert(t.enqueue(new Cohort(0.0, 0.5, 100), maxQueueSec = 4.0) == 0.0)
    assert(t.queuedWork == 0.5)
    assert(t.queuedTuples == 100)
  }

  test("enqueue refuses work beyond the back-pressure cap") {
    val t = new TaskRuntime(0)
    assert(t.enqueue(new Cohort(0.0, 3.0, 300), 4.0) == 0.0)
    val refused = t.enqueue(new Cohort(0.0, 2.0, 200), 4.0)
    assert(math.abs(refused - 100.0) < 1e-9, s"half the second cohort refused: $refused")
    assert(math.abs(t.queuedWork - 4.0) < 1e-9)
  }

  test("enqueue refuses everything when full") {
    val t = new TaskRuntime(0)
    t.enqueue(new Cohort(0.0, 4.0, 400), 4.0)
    assert(t.enqueue(new Cohort(0.0, 1.0, 100), 4.0) == 100.0)
  }

  test("drain completes work FIFO and reports latency") {
    val t = new TaskRuntime(0)
    val stats = new CompletionStats
    t.enqueue(new Cohort(0.0, 0.010, 10), 4.0)
    t.enqueue(new Cohort(0.001, 0.010, 10), 4.0)
    val done = t.drain(0.010, nowSec = 0.010, stats)
    assert(math.abs(done - 10.0) < 1e-9, "exactly the first cohort drains")
    assert(math.abs(stats.meanLatency - 0.010) < 1e-9)
    assert(math.abs(t.queuedWork - 0.010) < 1e-9)
  }

  test("drain splits a cohort when capacity runs out") {
    val t = new TaskRuntime(0)
    val stats = new CompletionStats
    t.enqueue(new Cohort(0.0, 0.020, 20), 4.0)
    val done = t.drain(0.005, 0.005, stats)
    assert(math.abs(done - 5.0) < 1e-9)
    assert(math.abs(t.queuedTuples - 15.0) < 1e-9)
  }

  test("drainedWork accumulates (labeling-tuple bookkeeping)") {
    val t = new TaskRuntime(0)
    val stats = new CompletionStats
    t.enqueue(new Cohort(0.0, 0.030, 30), 4.0)
    t.drain(0.010, 0.010, stats)
    t.drain(0.010, 0.020, stats)
    assert(math.abs(t.drainedWork - 0.020) < 1e-9)
    assert(!t.isDrained)
    t.drain(0.010, 0.030, stats)
    assert(t.isDrained)
  }

  test("CompletionStats mean and quantile") {
    val s = new CompletionStats
    s.record(99, 0.001)
    s.record(1, 10.0)
    assert(math.abs(s.meanLatency - (99 * 0.001 + 10.0) / 100) < 1e-9)
    assert(s.latencyQuantile(0.5) < 0.002)
    assert(s.latencyQuantile(0.999) > 5.0)
  }

  test("CompletionStats addFrom merges histograms") {
    val a = new CompletionStats
    val b = new CompletionStats
    a.record(10, 0.001)
    b.record(10, 1.0)
    a.addFrom(b)
    assert(a.tuples == 20)
    assert(a.latencyQuantile(0.99) > 0.5)
  }

  test("ExecutorRuntime computes imbalance from task shares") {
    val rt = new ExecutorRuntime(
      OperatorSpec("op", 1e-3, 128, 128, 1024), 0, numShards = 4, localNode = 0,
      initialTaskNodes = IndexedSeq(0, 0))
    rt.shardWeight(0) = 0.7; rt.shardWeight(1) = 0.1
    rt.shardWeight(2) = 0.1; rt.shardWeight(3) = 0.1
    rt.refreshTaskShares()
    // round-robin map: shards 0,2 -> task0 (0.8), shards 1,3 -> task1 (0.2)
    assert(math.abs(rt.imbalance - 1.6) < 1e-9)
  }

  test("ExecutorRuntime remoteShare counts only remote task shares") {
    val rt = new ExecutorRuntime(
      OperatorSpec("op", 1e-3, 128, 128, 1024), 0, numShards = 2, localNode = 0,
      initialTaskNodes = IndexedSeq(0, 1))
    rt.shardWeight(0) = 0.5; rt.shardWeight(1) = 0.5
    rt.refreshTaskShares()
    assert(math.abs(rt.remoteShare - 0.5) < 1e-9)
  }

  test("ExecutorRuntime paused shards leave the routing shares") {
    val rt = new ExecutorRuntime(
      OperatorSpec("op", 1e-3, 128, 128, 1024), 0, numShards = 2, localNode = 0,
      initialTaskNodes = IndexedSeq(0))
    rt.shardWeight(0) = 0.6; rt.shardWeight(1) = 0.4
    rt.shardPaused(1) = true
    rt.refreshTaskShares()
    assert(math.abs(rt.taskShare(0) - 0.6) < 1e-9)
    assert(math.abs(rt.totalShare - 1.0) < 1e-9, "totalShare still counts paused arrivals")
  }

  test("ClusterSpec transfer time includes latency and bandwidth") {
    val c = ClusterSpec(2, 8, networkBytesPerSec = 100e6, networkLatencySec = 1e-3)
    assert(c.transferSec(0) == 0.0)
    assert(math.abs(c.transferSec(100e6) - 1.001) < 1e-9)
    assert(c.totalCores == 16)
  }
}
