package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.QueueingModel._

class QueueingModelSpec extends AnyFunSuite {

  test("erlangC single server equals utilisation (M/M/1)") {
    // For k=1, P(wait) = ρ.
    assert(math.abs(erlangC(1, 0.5) - 0.5) < 1e-12)
    assert(math.abs(erlangC(1, 0.9) - 0.9) < 1e-12)
  }

  test("erlangC is 0 at zero load") {
    assert(erlangC(4, 0.0) == 0.0)
  }

  test("erlangC increases with offered load") {
    val values = Seq(0.5, 1.0, 2.0, 3.0, 3.9).map(erlangC(4, _))
    assert(values == values.sorted)
  }

  test("erlangC decreases with more servers at fixed load") {
    val values = Seq(3, 4, 6, 10, 20).map(erlangC(_, 2.5))
    assert(values == values.sorted.reverse)
  }

  test("erlangC rejects unstable inputs") {
    intercept[IllegalArgumentException](erlangC(2, 2.0))
    intercept[IllegalArgumentException](erlangC(0, 0.5))
  }

  test("sojournTime M/M/1 closed form 1/(mu-lambda)") {
    // E[T] for M/M/1 = 1/(μ−λ).
    val t = sojournTime(lambda = 50, mu = 100, k = 1)
    assert(math.abs(t - 1.0 / 50) < 1e-9)
  }

  test("sojournTime at zero arrivals is pure service time") {
    assert(sojournTime(0, 200, 3) == 1.0 / 200)
  }

  test("sojournTime unstable system is infinite") {
    assert(sojournTime(300, 100, 2).isPosInfinity)
  }

  test("sojournTime decreases with added cores") {
    val ts = (2 to 10).map(sojournTime(180, 100, _))
    assert(ts == ts.sorted.reverse)
    assert(ts.last >= 1.0 / 100, "never below service time")
  }

  test("ExecutorLoad.minCores is floor(lambda/mu)+1") {
    assert(ExecutorLoad(999, 100).minCores == 10)
    assert(ExecutorLoad(1000, 100).minCores == 11)
    assert(ExecutorLoad(0, 100).minCores == 1)
  }

  test("topologyLatency weights by arrival rates (Equation 1)") {
    val loads = IndexedSeq(ExecutorLoad(100, 200), ExecutorLoad(50, 200))
    val t = topologyLatency(loads, IndexedSeq(1, 1), lambda0 = 100)
    val expected = (100 * sojournTime(100, 200, 1) + 50 * sojournTime(50, 200, 1)) / 100
    assert(math.abs(t - expected) < 1e-12)
  }

  test("allocateCores meets the latency target when cores suffice") {
    val loads = IndexedSeq(ExecutorLoad(500, 100), ExecutorLoad(100, 100))
    val a = allocateCores(loads, latencyTarget = 0.05, totalCores = 64)
    assert(a.feasible)
    assert(a.predictedLatency <= 0.05 + 1e-9)
    assert(a.cores(0) >= 6, "hot executor needs at least stability minimum")
    assert(a.cores(1) >= 2)
  }

  test("allocateCores starts from stability minima") {
    val loads = IndexedSeq(ExecutorLoad(950, 100))
    val a = allocateCores(loads, latencyTarget = 10.0, totalCores = 64)
    // Lax target: minimum allocation (⌊9.5⌋+1 = 10) already satisfies it.
    assert(a.cores == IndexedSeq(10))
    assert(a.feasible)
  }

  test("allocateCores gives extra cores to the executor that helps most") {
    val loads = IndexedSeq(ExecutorLoad(990, 100), ExecutorLoad(10, 100))
    val a = allocateCores(loads, latencyTarget = 0.011, totalCores = 64)
    assert(a.feasible)
    assert(a.cores(0) > a.cores(1), "hot executor receives the extra cores")
  }

  test("allocateCores reports infeasible when demand exceeds the cluster") {
    val loads = IndexedSeq(ExecutorLoad(5000, 100)) // needs 51 cores minimum
    val a = allocateCores(loads, latencyTarget = 0.05, totalCores = 8)
    assert(!a.feasible)
  }

  test("allocateCores stops growing once latency target met") {
    val loads = IndexedSeq(ExecutorLoad(10, 100))
    val a = allocateCores(loads, latencyTarget = 1.0, totalCores = 64)
    assert(a.cores.sum <= 2, s"should not burn cores needlessly: ${a.cores}")
  }

  test("allocateCores handles many executors") {
    val loads = IndexedSeq.tabulate(32)(j => ExecutorLoad(50 + j * 10, 100))
    // Eq. (1) sums stage latencies weighted by λ_j/λ_0, so a 32-stage
    // topology has an irreducible floor of Σ λ_j (1/μ) / λ_0 ≈ 0.18 s.
    val a = allocateCores(loads, latencyTarget = 0.25, totalCores = 256)
    assert(a.feasible)
    assert(a.cores.sum <= 256)
    loads.indices.foreach(j => assert(a.cores(j) >= loads(j).minCores))
  }
}
