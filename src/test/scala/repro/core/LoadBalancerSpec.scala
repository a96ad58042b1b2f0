package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers
import repro.core.LoadBalancer._

class LoadBalancerSpec extends AnyFunSuite with PropHelpers {

  test("taskLoads aggregates per task") {
    val loads = taskLoads(IndexedSeq(1.0, 2.0, 3.0, 4.0), IndexedSeq(0, 1, 0, 1), 2)
    assert(loads.toSeq == Seq(4.0, 6.0))
  }

  test("imbalance of perfect balance is 1") {
    assert(imbalance(IndexedSeq(1.0, 1.0), IndexedSeq(0, 1), 2) == 1.0)
  }

  test("imbalance of zero workload is 1 (trivially balanced)") {
    assert(imbalance(IndexedSeq(0.0, 0.0), IndexedSeq(0, 1), 2) == 1.0)
  }

  test("imbalance detects all-on-one-task skew") {
    assert(imbalance(IndexedSeq(1.0, 1.0), IndexedSeq(0, 0), 2) == 2.0)
  }

  test("rebalance fixes a skewed assignment to within theta") {
    val shardLoad = IndexedSeq.fill(16)(1.0)
    val skewed = IndexedSeq.fill(16)(0) // everything on task 0 of 4
    val r = rebalance(shardLoad, skewed, numTasks = 4, theta = 1.2)
    assert(r.imbalance <= 1.2)
    assert(r.moves.nonEmpty)
  }

  test("rebalance leaves a balanced assignment untouched") {
    val shardLoad = IndexedSeq.fill(8)(1.0)
    val balanced = IndexedSeq(0, 1, 2, 3, 0, 1, 2, 3)
    val r = rebalance(shardLoad, balanced, numTasks = 4, theta = 1.2)
    assert(r.moves.isEmpty)
    assert(r.assignment == balanced)
  }

  test("rebalance moves minimal shards for a small perturbation") {
    // One task has one extra shard-worth of load; a single move suffices.
    val shardLoad = IndexedSeq(1.0, 1.0, 1.0, 1.0, 1.0, 1.0, 1.0, 1.0, 1.0)
    val skewed = IndexedSeq(0, 0, 0, 0, 0, 1, 1, 2, 2)
    val r = rebalance(shardLoad, skewed, numTasks = 3, theta = 1.2)
    assert(r.imbalance <= 1.2)
    assert(r.moves.length <= 2, s"expected few moves, got ${r.moves}")
  }

  test("rebalance cannot split one dominant shard (granularity limit)") {
    // §3.1: too few shards -> poor balancing quality; the algorithm must
    // converge without thrashing.
    val shardLoad = IndexedSeq(100.0, 1.0, 1.0)
    val r = rebalance(shardLoad, IndexedSeq(0, 0, 0), numTasks = 2, theta = 1.2)
    assert(r.imbalance > 1.2, "hot shard cannot be split")
    assert(r.moves.length <= 3)
  }

  test("rebalance respects explicit maxMoves budget") {
    val shardLoad = IndexedSeq.fill(64)(1.0)
    val skewed = IndexedSeq.fill(64)(0)
    val r = rebalance(shardLoad, skewed, numTasks = 8, theta = 1.01, maxMoves = 5)
    assert(r.moves.length <= 5)
  }

  test("rebalance property: never worsens imbalance, assignment stays valid") {
    forSeeds(100) { rng =>
      val n = rng.nextInt(7) + 2
      val z = n + rng.nextInt(64 - n + 1)
      val loads = IndexedSeq.fill(z)(rng.nextDouble() * 10.0)
      val assign = IndexedSeq.fill(z)(rng.nextInt(n))
      val before = imbalance(loads, assign, n)
      val r = rebalance(loads, assign, n, theta = 1.2)
      assert(r.imbalance <= before + 1e-9)
      r.assignment.foreach(t => assert(t >= 0 && t < n))
      assert(r.assignment.length == loads.length)
    }
  }

  test("rebalance moves replay to the returned assignment") {
    val loads = IndexedSeq(5.0, 4.0, 3.0, 2.0, 1.0, 1.0, 1.0, 1.0)
    val start = IndexedSeq(0, 0, 0, 0, 0, 1, 1, 1)
    val r = rebalance(loads, start, numTasks = 2, theta = 1.1)
    val replayed = start.toArray
    r.moves.foreach(m => {
      assert(replayed(m.shard) == m.fromTask, "move source matches current owner")
      replayed(m.shard) = m.toTask
    })
    assert(replayed.toIndexedSeq == r.assignment)
  }

  test("collapse merges multi-hop moves") {
    val ms = List(Move(3, 0, 1), Move(3, 1, 2), Move(5, 1, 0))
    assert(collapse(ms) == List(Move(3, 0, 2), Move(5, 1, 0)))
  }

  test("collapse drops moves that return home") {
    val ms = List(Move(3, 0, 1), Move(3, 1, 0))
    assert(collapse(ms).isEmpty)
  }

  test("resize up spreads shards onto new tasks") {
    val loads = IndexedSeq.fill(12)(1.0)
    val start = IndexedSeq(0, 0, 0, 0, 0, 0, 1, 1, 1, 1, 1, 1)
    val r = resize(loads, start, oldNumTasks = 2, newNumTasks = 4)
    assert(r.imbalance <= 1.2)
    assert((0 until 4).forall(t => r.assignment.contains(t)), "all tasks get shards")
  }

  test("resize down evacuates removed tasks") {
    val loads = IndexedSeq.fill(12)(1.0)
    val start = IndexedSeq(0, 1, 2, 3, 0, 1, 2, 3, 0, 1, 2, 3)
    val r = resize(loads, start, oldNumTasks = 4, newNumTasks = 2)
    r.assignment.foreach(t => assert(t < 2, "no shard may stay on a removed task"))
    assert(r.imbalance <= 1.2)
  }

  test("resize down forced moves originate at removed tasks") {
    val loads = IndexedSeq.fill(8)(1.0)
    val start = IndexedSeq(0, 1, 2, 3, 0, 1, 2, 3)
    val r = resize(loads, start, oldNumTasks = 4, newNumTasks = 2)
    val forced = r.moves.filter(m => m.fromTask >= 2)
    assert(forced.map(_.shard).toSet == Set(2, 3, 6, 7))
  }

  test("rejects invalid arguments") {
    intercept[IllegalArgumentException](imbalance(IndexedSeq(1.0), IndexedSeq(0), 0))
    intercept[IllegalArgumentException](rebalance(IndexedSeq(1.0), IndexedSeq(0, 1), 2))
    intercept[IllegalArgumentException](rebalance(IndexedSeq(1.0), IndexedSeq(0), 1, theta = 0.5))
  }
}
