package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import repro.workload.MicroBenchWorkload

/** §5.2–5.3 parameter-study shapes at small scale: single-executor
  * scalability under elasticity costs (Fig. 12) and the impact of the
  * number of shards z and executors y (Fig. 13).
  */
class ParameterStudySpec extends AnyFunSuite {

  private val cluster = ClusterSpec(2, 8)

  private def run(y: Int, z: Int, omega: Double, rate: Double,
                  shardState: Double = 32 * 1024, skew: Double = 0.8): SimResult = {
    val cfg = SimConfig(cluster, Paradigm.ExecutorCentric(),
      executorsPerOp = y, shardsPerExecutor = z,
      executorsPerOpOverride = Map("sink" -> 2),
      durationSec = 20, warmupSec = 5)
    val w = new MicroBenchWorkload(rate, omega, shardStateBytes = shardState,
      numKeys = 256, zipfSkew = skew, seed = 77)
    new StreamSimulator(cfg, w).run()
  }

  test("Fig 13: too few shards per executor hurts throughput (z trade-off)") {
    // z=1: one shard per executor — no intra-executor balancing possible,
    // a multi-core executor cannot use its cores.
    val coarse = run(y = 4, z = 1, omega = 0, rate = 12000)
    val fine = run(y = 4, z = 64, omega = 0, rate = 12000)
    assert(fine.throughput > coarse.throughput * 1.2,
      s"fine ${fine.throughput} vs coarse ${coarse.throughput}")
  }

  test("Fig 13: finer sharding has diminishing returns") {
    val mid = run(y = 4, z = 64, omega = 0, rate = 12000)
    val fine = run(y = 4, z = 256, omega = 0, rate = 12000)
    assert(fine.throughput < mid.throughput * 1.1,
      s"z=256 ${fine.throughput} vs z=64 ${mid.throughput}: no big win expected")
  }

  test("Fig 13: y = total cores degrades to the static approach") {
    // One core per executor, forever: elasticity is lost and skew bites.
    val degenerate = run(y = 14, z = 16, omega = 0, rate = 12000)
    val elastic = run(y = 4, z = 64, omega = 0, rate = 12000)
    assert(elastic.meanLatencySec < degenerate.meanLatencySec,
      s"elastic ${elastic.meanLatencySec} vs degenerate ${degenerate.meanLatencySec}")
  }

  test("Fig 12: huge shard state throttles adaptation under dynamics") {
    // y=1: the single executor spans both nodes, so rebalancing moves cross
    // the network and pay the state transfer.
    val small = run(y = 1, z = 128, omega = 8, rate = 10000, shardState = 32 * 1024)
    val huge = run(y = 1, z = 128, omega = 8, rate = 10000, shardState = 32 * 1024 * 1024)
    // 32 MB shards take ~0.26 s each to migrate: rebalancing stalls, queues
    // build behind paused shards, latency rises.
    assert(huge.meanLatencySec > small.meanLatencySec,
      s"huge ${huge.meanLatencySec} vs small ${small.meanLatencySec}")
    assert(small.throughput >= huge.throughput * 0.99)
  }

  test("Fig 12: migration bytes scale with shard state size") {
    val small = run(y = 1, z = 128, omega = 8, rate = 10000, shardState = 32 * 1024)
    val big = run(y = 1, z = 128, omega = 8, rate = 10000, shardState = 1024 * 1024)
    if (small.moves.exists(_.interNode) && big.moves.exists(_.interNode)) {
      val perMoveSmall = small.totalMigrationBytes / math.max(1, small.moves.count(_.interNode))
      val perMoveBig = big.totalMigrationBytes / math.max(1, big.moves.count(_.interNode))
      assert(perMoveBig > perMoveSmall * 10)
    }
  }

  test("Fig 11: p99 latency stays bounded while a single executor scales out") {
    val r = run(y = 1, z = 128, omega = 0, rate = 12000, skew = 0.3)
    assert(r.throughput > 11000, s"throughput ${r.throughput}")
    assert(r.p99LatencySec < 1.0, s"p99 ${r.p99LatencySec}")
  }
}
