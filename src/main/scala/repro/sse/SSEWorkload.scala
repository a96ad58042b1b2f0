package repro.sse

import repro.sim.{KeyFrequencies, OperatorSpec, Workload}

/** Simulator workload modelling the SSE application (§5.4, Fig. 14–15).
  *
  * The real trace (anonymised Shanghai Stock Exchange orders, ~8 M records
  * per trading hour) is proprietary; this synthetic equivalent reproduces
  * the two properties the elasticity experiments depend on: *bursty
  * aggregate rate* and *shifting per-stock popularity* (Fig. 15 shows both).
  * Stock popularity is zipf; every `regimeSec` a new burst regime promotes a
  * random ~2% of stocks to hot (the Fig. 15 spikes) and re-draws the rest.
  *
  * Topology: transactor → 6 statistics + 5 event operators, all keyed by
  * stock id. Per-tuple CPU costs are calibrated against the real bolt
  * implementations (see SSECalibrationSpec): matching a limit order against
  * a resting book plus the per-tuple framework overhead of the paper's
  * Storm prototype is the dominant cost.
  *
  * Stock skew and burst factors are calibrated so the hottest stock stays
  * below one core's service rate (1/transactorCost): stateful stream
  * processing must process a key's tuples in order, so a single stock above
  * that rate would overload *any* paradigm — the real trace respects the
  * same physics (Fig. 15's top stock is a few thousand orders/s).
  *
  * @param offeredRate  mean order arrival rate (orders/s)
  * @param txPerOrder   transactions emitted per order (matching selectivity)
  */
final class SSEWorkload(offeredRate: Double,
                        numStocks: Int = 2000,
                        txPerOrder: Double = 0.7,
                        regimeSec: Double = 10.0,
                        rateBurstiness: Double = 0.35,
                        stockSkew: Double = 0.3,
                        hotFraction: Double = 0.02,
                        hotFactor: Double = 1.5,
                        transactorCostSec: Double = 0.8e-3,
                        statsCostSec: Double = 0.04e-3,
                        eventCostSec: Double = 0.02e-3,
                        spoutExecutors: Int = 32,
                        seed: Long = 2019) extends Workload {
  require(offeredRate > 0, s"offeredRate must be positive: $offeredRate")
  require(txPerOrder > 0 && txPerOrder <= 2, s"txPerOrder out of range: $txPerOrder")
  require(rateBurstiness >= 0 && rateBurstiness < 1, s"bad burstiness $rateBurstiness")

  private val statsOps =
    Seq("moving_avg", "volume", "vwap", "min_max", "trade_count", "composite_index")
  private val eventOps =
    Seq("price_alarm", "volume_surge", "price_jump", "large_trade", "momentum")

  /** 96-byte orders in, 160-byte transaction records out (§5.4). */
  val transactor: OperatorSpec = OperatorSpec(
    name = "transactor",
    cpuSecPerTuple = transactorCostSec,
    tupleBytes = 96.0,
    outBytes = 160.0,
    statePerShardBytes = 64.0 * 1024, // resting book state per shard
    downstream = (statsOps ++ eventOps).map(_ -> txPerOrder))

  private def analyticsOp(name: String, cost: Double): OperatorSpec = OperatorSpec(
    name = name,
    cpuSecPerTuple = cost,
    tupleBytes = 160.0,
    outBytes = 64.0,
    statePerShardBytes = 16.0 * 1024)

  override val operators: IndexedSeq[OperatorSpec] =
    (transactor +: (statsOps.map(analyticsOp(_, statsCostSec)) ++
      eventOps.map(analyticsOp(_, eventCostSec)))).toIndexedSeq

  override val throughputOp: String = "transactor"
  override val upstreamExecutorCount: Int = spoutExecutors

  private val freqs = new KeyFrequencies(numStocks, stockSkew, seed)
  private val rng = new scala.util.Random(seed ^ 0x55EfeedL)

  private var regimeIndex: Long = -1
  private var rateFactor: Double = 1.0

  override def externalRate(op: String, timeSec: Double): Double =
    if (op == "transactor") offeredRate * rateFactor else 0.0

  override def advanceTo(timeSec: Double): Boolean = {
    val idx = (timeSec / regimeSec).toLong
    if (idx != regimeIndex) {
      regimeIndex = idx
      freqs.newRegime(hotFraction, hotFactor)
      // Bursty aggregate rate around the mean (Fig. 15's ragged envelope).
      rateFactor = 1.0 + rateBurstiness * (2 * rng.nextDouble() - 1.0)
      true
    } else false
  }

  override def shardWeights(op: String, numExecutors: Int, shardsPerExecutor: Int): Array[Double] =
    freqs.shardWeights(numExecutors, shardsPerExecutor)
}
