package repro.sse

import org.scalatest.funsuite.AnyFunSuite
import repro.api.{InMemoryKeyedState, StreamTuple}

class BoltsSpec extends AnyFunSuite {

  private def tx(price: Long, shares: Long, t: Long = 0, stock: Long = 7) =
    Transaction(t, stock, price, shares, buyerId = 1, sellerId = 2)
  private def tuple(t: Transaction) = StreamTuple(t.stockId, t)

  test("TransactorBolt creates a book per key and emits transactions") {
    val bolt = new TransactorBolt
    val state = new InMemoryKeyedState
    val o1 = Order(1, 1, 7, isBuy = false, priceTicks = 100, volume = 5, timeMs = 0)
    val o2 = Order(2, 2, 7, isBuy = true, priceTicks = 100, volume = 5, timeMs = 1)
    assert(bolt.process(StreamTuple(7, o1), state).isEmpty)
    val out = bolt.process(StreamTuple(7, o2), state)
    assert(out.size == 1)
    val t = out.head.payload.asInstanceOf[Transaction]
    assert(t.shares == 5 && t.priceTicks == 100)
    assert(state.get[OrderBook](7).isDefined, "book persisted in keyed state")
  }

  test("TransactorBolt keeps independent books per stock") {
    val bolt = new TransactorBolt
    val state = new InMemoryKeyedState
    bolt.process(StreamTuple(1, Order(1, 1, 1, isBuy = false, priceTicks = 50, volume = 5, timeMs = 0)), state)
    val out = bolt.process(StreamTuple(2, Order(2, 2, 2, isBuy = true, priceTicks = 50, volume = 5, timeMs = 1)), state)
    assert(out.isEmpty, "stocks do not cross-match")
    assert(state.size == 2)
  }

  test("MovingAveragePriceBolt averages over the window") {
    val bolt = new MovingAveragePriceBolt(window = 2)
    val state = new InMemoryKeyedState
    bolt.process(tuple(tx(100, 1)), state)
    bolt.process(tuple(tx(200, 1)), state)
    val out = bolt.process(tuple(tx(300, 1)), state)
    assert(out.head.payload == 250.0, "window 2: mean of 200 and 300")
  }

  test("VolumeBolt accumulates shares") {
    val bolt = new VolumeBolt
    val state = new InMemoryKeyedState
    bolt.process(tuple(tx(100, 10)), state)
    val out = bolt.process(tuple(tx(100, 15)), state)
    assert(out.head.payload == 25L)
  }

  test("VwapBolt computes volume-weighted average price") {
    val bolt = new VwapBolt
    val state = new InMemoryKeyedState
    bolt.process(tuple(tx(100, 10)), state)
    val out = bolt.process(tuple(tx(200, 30)), state)
    assert(out.head.payload == (100.0 * 10 + 200.0 * 30) / 40)
  }

  test("MinMaxPriceBolt tracks extremes") {
    val bolt = new MinMaxPriceBolt
    val state = new InMemoryKeyedState
    bolt.process(tuple(tx(150, 1)), state)
    bolt.process(tuple(tx(90, 1)), state)
    val out = bolt.process(tuple(tx(120, 1)), state)
    assert(out.head.payload == ((90L, 150L)))
  }

  test("TradeCountBolt counts transactions per key") {
    val bolt = new TradeCountBolt
    val state = new InMemoryKeyedState
    bolt.process(tuple(tx(1, 1)), state)
    bolt.process(StreamTuple(8, tx(1, 1, stock = 8)), state)
    val out = bolt.process(tuple(tx(1, 1)), state)
    assert(out.head.payload == 2L, "keys counted independently")
  }

  test("CompositeIndexBolt averages last prices across stocks in the bucket") {
    val bolt = new CompositeIndexBolt
    val state = new InMemoryKeyedState
    bolt.process(StreamTuple(0, tx(100, 1, stock = 1)), state)
    val out = bolt.process(StreamTuple(0, tx(300, 1, stock = 2)), state)
    assert(out.head.payload == 200.0)
  }

  test("PriceAlarmBolt fires only above threshold") {
    val bolt = new PriceAlarmBolt(thresholdTicks = 100)
    val state = new InMemoryKeyedState
    assert(bolt.process(tuple(tx(100, 1)), state).isEmpty)
    assert(bolt.process(tuple(tx(101, 1)), state).nonEmpty)
  }

  test("VolumeSurgeBolt fires when windowed volume exceeds limit") {
    val bolt = new VolumeSurgeBolt(surgeVolume = 100, windowMs = 1000)
    val state = new InMemoryKeyedState
    assert(bolt.process(tuple(tx(1, 60, t = 0)), state).isEmpty)
    assert(bolt.process(tuple(tx(1, 60, t = 500)), state).nonEmpty, "120 > 100 within window")
    assert(bolt.process(tuple(tx(1, 60, t = 2000)), state).isEmpty, "window reset")
  }

  test("PriceJumpBolt detects relative jumps") {
    val bolt = new PriceJumpBolt(pct = 0.10)
    val state = new InMemoryKeyedState
    assert(bolt.process(tuple(tx(100, 1)), state).isEmpty, "no previous price")
    assert(bolt.process(tuple(tx(105, 1)), state).isEmpty, "5% is below threshold")
    assert(bolt.process(tuple(tx(120, 1)), state).nonEmpty, "14% jump fires")
  }

  test("LargeTradeBolt is stateless and threshold-gated") {
    val bolt = new LargeTradeBolt(shares = 1000)
    val state = new InMemoryKeyedState
    assert(bolt.process(tuple(tx(1, 1000)), state).isEmpty)
    assert(bolt.process(tuple(tx(1, 1001)), state).nonEmpty)
    assert(state.size == 0)
  }

  test("MomentumBolt fires after N consecutive upticks") {
    val bolt = new MomentumBolt(run = 3)
    val state = new InMemoryKeyedState
    assert(bolt.process(tuple(tx(100, 1)), state).isEmpty)
    assert(bolt.process(tuple(tx(101, 1)), state).isEmpty)
    assert(bolt.process(tuple(tx(102, 1)), state).isEmpty)
    assert(bolt.process(tuple(tx(103, 1)), state).nonEmpty, "3rd uptick")
    assert(bolt.process(tuple(tx(99, 1)), state).isEmpty, "downtick resets")
  }

  test("InMemoryKeyedState get/put/remove round-trip") {
    val s = new InMemoryKeyedState
    assert(s.get[String](1).isEmpty)
    s.put(1, "x")
    assert(s.get[String](1).contains("x"))
    s.remove(1)
    assert(s.get[String](1).isEmpty)
  }
}
