package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.CpuAssignment._

class CpuAssignmentSpec extends AnyFunSuite {

  private val MB = 1024.0 * 1024

  private def infos(n: Int, node: Int => Int, state: Double = 8 * MB,
                    intensity: Int => Double = _ => 0.0): IndexedSeq[ExecutorInfo] =
    IndexedSeq.tabulate(n)(j => ExecutorInfo(node(j), state, intensity(j)))

  test("Assignment.totalOf and usedOn") {
    val a = Assignment(IndexedSeq(IndexedSeq(1, 0), IndexedSeq(2, 3)))
    assert(a.totalOf(0) == 3)
    assert(a.totalOf(1) == 3)
    assert(a.usedOn(0) == 1)
    assert(a.usedOn(1) == 5)
  }

  test("oneCoreLocal places each executor's core on its local node") {
    val ex = infos(4, j => j % 2)
    val a = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 4)
    assert(a.totalOf(0) == 1 && a.cores(0)(0) == 1)
    assert(a.cores(1)(1) == 1)
    assert(a.usedOn(0) == 2 && a.usedOn(1) == 2)
  }

  test("oneCoreLocal rejects over-capacity placement") {
    val ex = infos(3, _ => 0)
    intercept[IllegalArgumentException](Assignment.oneCoreLocal(ex, 2, 2))
  }

  test("migrationCostFrom is zero for identical assignments") {
    val ex = infos(2, _ => 0)
    val a = Assignment(IndexedSeq(IndexedSeq(2, 2), IndexedSeq(0, 0)))
    assert(a.migrationCostFrom(a, ex) == 0.0)
  }

  test("migrationCostFrom counts state leaving a node") {
    val ex = infos(1, _ => 0, state = 8 * MB)
    val before = Assignment(IndexedSeq(IndexedSeq(2), IndexedSeq(0)))
    val after = Assignment(IndexedSeq(IndexedSeq(1), IndexedSeq(1)))
    // Half the cores left node 0: half the state moves out.
    assert(math.abs(after.migrationCostFrom(before, ex) - 4 * MB) < 1.0)
  }

  test("assignOnce grows an executor using free cores first") {
    val ex = infos(2, j => j)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 4)
    assignOnce(IndexedSeq(3, 1), prev, IndexedSeq(4, 4), ex, phi = Double.MaxValue) match {
      case Success(a) =>
        assert(a.totalOf(0) == 3)
        assert(a.totalOf(1) == 1)
        assert((0 until 2).forall(i => a.usedOn(i) <= 4))
      case Fail => fail("expected success")
    }
  }

  test("assignOnce prefers the local node (cheapest C+)") {
    val ex = infos(1, _ => 0)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 8)
    assignOnce(IndexedSeq(4), prev, IndexedSeq(8, 8), ex, phi = Double.MaxValue) match {
      case Success(a) =>
        // All nodes free; C+ is identical everywhere, but the data-intensive
        // constraint is off — greedy still lands everything locally because
        // x_ij grows there, lowering C+ for node 0 after the first pick.
        assert(a.totalOf(0) == 4)
        assert(a.cores(0)(0) >= 2, s"local node should host most cores: ${a.cores}")
      case Fail => fail("expected success")
    }
  }

  test("data-intensive executor only accepts local cores") {
    val ex = infos(2, j => j, intensity = j => if (j == 0) 10 * MB else 0.0)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 2)
    // Executor 0 wants 4 cores but its local node only has 2; with phi below
    // its intensity the algorithm must FAIL rather than go remote.
    assignOnce(IndexedSeq(4, 1), prev, IndexedSeq(2, 2), ex, phi = 1 * MB) match {
      case Fail => succeed
      case Success(a) => fail(s"expected FAIL, got $a")
    }
  }

  test("assign doubles phi until feasible") {
    val ex = infos(2, j => j, intensity = j => if (j == 0) 10 * MB else 0.0)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 2)
    val (res, phiUsed) = assign(IndexedSeq(4, 1), prev, IndexedSeq(2, 4), ex, phi0 = 1 * MB)
    assert(res.isDefined, "doubling phi lifts the locality constraint")
    assert(phiUsed > 10 * MB, s"phi must exceed the executor's intensity, got $phiUsed")
    assert(res.get.totalOf(0) == 4)
  }

  test("assign returns None when capacity is genuinely insufficient") {
    val ex = infos(1, _ => 0)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 1, coresPerNode = 2)
    val (res, _) = assign(IndexedSeq(5), prev, IndexedSeq(2), ex)
    assert(res.isEmpty)
  }

  test("assignOnce deallocates over-provisioned executors to feed hot ones") {
    val ex = infos(2, _ => 0)
    val prev = Assignment(IndexedSeq(IndexedSeq(6, 2))) // node0: e0=6, e1=2
    assignOnce(IndexedSeq(2, 6), prev, IndexedSeq(8), ex, phi = Double.MaxValue) match {
      case Success(a) =>
        assert(a.totalOf(0) == 2)
        assert(a.totalOf(1) == 6)
        assert(a.usedOn(0) == 8)
      case Fail => fail("expected success")
    }
  }

  test("assignOnce respects node capacity") {
    val ex = infos(3, j => j % 2)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 4)
    assignOnce(IndexedSeq(3, 3, 2), prev, IndexedSeq(4, 4), ex, phi = Double.MaxValue) match {
      case Success(a) => (0 until 2).foreach(i => assert(a.usedOn(i) <= 4))
      case Fail => fail("expected success")
    }
  }

  test("minimal-migration: shrinking prefers nodes with fewest cores") {
    val ex = infos(1, _ => 0, state = 32 * MB)
    // 3 cores on node0, 1 on node1; shrinking to 3 should drop the node1
    // core (C- smaller when x_ij is small ... C- = s(X-x)/X(X-1): node1 has
    // x=1 -> cost s*3/12, node0 x=3 -> s*1/12; so it drops a node0 core).
    val prev = Assignment(IndexedSeq(IndexedSeq(3), IndexedSeq(1)))
    assignOnce(IndexedSeq(3), prev, IndexedSeq(4, 4), ex, phi = Double.MaxValue) match {
      case Success(a) =>
        assert(a.totalOf(0) == 3)
        // Deallocating on the majority node is cheapest per the paper's C-.
        assert(a.cores(0)(0) == 2 && a.cores(1)(0) == 1, s"got ${a.cores}")
      case Fail => fail("expected success")
    }
  }

  test("assignNaive satisfies the allocation without locality") {
    val ex = infos(4, j => j % 2)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 2, coresPerNode = 8)
    val res = assignNaive(IndexedSeq(4, 4, 2, 2), prev, IndexedSeq(8, 8), ex)
    assert(res.isDefined)
    val a = res.get
    (0 until 4).foreach(j => assert(a.totalOf(j) == IndexedSeq(4, 4, 2, 2)(j)))
    (0 until 2).foreach(i => assert(a.usedOn(i) <= 8))
  }

  test("naive spreads an executor across nodes more than the optimizing assigner") {
    val ex = infos(1, _ => 0)
    val prev = Assignment.oneCoreLocal(ex, numNodes = 4, coresPerNode = 8)
    val Some(naive) = assignNaive(IndexedSeq(6), prev, IndexedSeq.fill(4)(8), ex)
    val Success(opt) = assignOnce(IndexedSeq(6), prev, IndexedSeq.fill(4)(8), ex, Double.MaxValue)
    val naiveNodes = (0 until 4).count(i => naive.cores(i)(0) > 0)
    val optNodes = (0 until 4).count(i => opt.cores(i)(0) > 0)
    assert(optNodes <= naiveNodes, s"opt=$optNodes naive=$naiveNodes")
    assert(optNodes == 1, "optimizing assigner keeps the executor local")
  }
}
