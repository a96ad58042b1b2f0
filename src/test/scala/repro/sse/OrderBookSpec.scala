package repro.sse

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class OrderBookSpec extends AnyFunSuite with PropHelpers {

  private def buy(id: Long, price: Long, vol: Long, t: Long = 0, trader: Long = 1) =
    Order(id, trader, stockId = 7, isBuy = true, priceTicks = price, volume = vol, timeMs = t)
  private def sell(id: Long, price: Long, vol: Long, t: Long = 0, trader: Long = 2) =
    Order(id, trader, stockId = 7, isBuy = false, priceTicks = price, volume = vol, timeMs = t)

  test("non-crossing orders rest in the book") {
    val b = new OrderBook(7)
    assert(b.execute(buy(1, 100, 10)).isEmpty)
    assert(b.execute(sell(2, 101, 10)).isEmpty)
    assert(b.depth == 2)
    assert(b.bestBid.contains(100L))
    assert(b.bestAsk.contains(101L))
  }

  test("crossing buy matches the resting ask at the ask price") {
    val b = new OrderBook(7)
    b.execute(sell(1, 100, 10, trader = 9))
    val fills = b.execute(buy(2, 105, 10, trader = 8))
    assert(fills.size == 1)
    assert(fills.head.priceTicks == 100, "trade at resting order's price")
    assert(fills.head.shares == 10)
    assert(fills.head.buyerId == 8 && fills.head.sellerId == 9)
    assert(b.depth == 0)
  }

  test("crossing sell matches the resting bid at the bid price") {
    val b = new OrderBook(7)
    b.execute(buy(1, 100, 10, trader = 5))
    val fills = b.execute(sell(2, 95, 10, trader = 6))
    assert(fills.size == 1)
    assert(fills.head.priceTicks == 100)
    assert(fills.head.buyerId == 5 && fills.head.sellerId == 6)
  }

  test("partial fill leaves remainder resting") {
    val b = new OrderBook(7)
    b.execute(sell(1, 100, 4))
    val fills = b.execute(buy(2, 100, 10))
    assert(fills.map(_.shares).sum == 4)
    assert(b.depth == 1, "unfilled 6 shares rest as a bid")
    assert(b.bestBid.contains(100L))
    assert(b.restingVolume == 6)
  }

  test("incoming order sweeps multiple price levels") {
    val b = new OrderBook(7)
    b.execute(sell(1, 100, 5))
    b.execute(sell(2, 101, 5))
    b.execute(sell(3, 102, 5))
    val fills = b.execute(buy(4, 101, 12))
    assert(fills.map(_.shares).sum == 10, "only asks priced <= 101 trade")
    assert(fills.map(_.priceTicks) == List(100L, 101L), "best price first")
    assert(b.bestAsk.contains(102L))
    assert(b.bestBid.contains(101L), "2 unfilled shares rest")
  }

  test("price priority: best ask first regardless of arrival order") {
    val b = new OrderBook(7)
    b.execute(sell(1, 105, 5))
    b.execute(sell(2, 100, 5))
    val fills = b.execute(buy(3, 110, 5))
    assert(fills.head.priceTicks == 100)
  }

  test("time priority within a price level (FIFO)") {
    val b = new OrderBook(7)
    b.execute(sell(1, 100, 5, trader = 11))
    b.execute(sell(2, 100, 5, trader = 12))
    val fills = b.execute(buy(3, 100, 5, trader = 13))
    assert(fills.head.sellerId == 11, "earlier resting order trades first")
  }

  test("volume conservation: traded + resting == submitted") {
    forSeeds(25) { rng =>
      val b = new OrderBook(7)
      var submitted = 0L
      var traded = 0L
      (1 to 200).foreach { i =>
        val o = Order(i, rng.nextInt(100) + 1, 7, rng.nextBoolean(),
          95 + rng.nextInt(11), rng.nextInt(50) + 1, i)
        submitted += o.volume
        traded += b.execute(o).map(_.shares).sum
      }
      assert(2 * traded + b.restingVolume == submitted,
        "each traded share consumes one share on each side")
    }
  }

  test("trades never cross limits: buyers never pay above their bid") {
    forSeeds(25) { rng =>
      val b = new OrderBook(7)
      (1 to 300).foreach { i =>
        val o = Order(i, 1, 7, rng.nextBoolean(), 90 + rng.nextInt(21), rng.nextInt(20) + 1, i)
        val fills = b.execute(o)
        fills.foreach { f =>
          if (o.isBuy) assert(f.priceTicks <= o.priceTicks)
          else assert(f.priceTicks >= o.priceTicks)
        }
      }
    }
  }

  test("book stays uncrossed: bestBid < bestAsk") {
    forSeeds(25) { rng =>
      val b = new OrderBook(7)
      (1 to 300).foreach { i =>
        b.execute(Order(i, 1, 7, rng.nextBoolean(), 90 + rng.nextInt(21), rng.nextInt(20) + 1, i))
        for (bb <- b.bestBid; ba <- b.bestAsk) assert(bb < ba, s"crossed book: $bb >= $ba")
      }
    }
  }

  test("rejects orders for the wrong stock") {
    val b = new OrderBook(7)
    intercept[IllegalArgumentException](
      b.execute(Order(1, 1, stockId = 8, isBuy = true, priceTicks = 1, volume = 1, timeMs = 0)))
  }

  test("rejects non-positive volume and price at construction") {
    intercept[IllegalArgumentException](buy(1, 100, 0))
    intercept[IllegalArgumentException](buy(1, 0, 10))
  }
}
