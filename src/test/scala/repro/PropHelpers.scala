package repro

import scala.util.Random

/** Minimal deterministic property-testing helper. The offline image ships
  * scalatest + scalacheck but not the scalatestplus bridge, so suites use
  * this instead of ScalaCheckPropertyChecks: `cases` seeded RNG draws, each
  * run against the property body.
  */
trait PropHelpers {
  def forSeeds(cases: Int, seed: Long = 1234L)(body: Random => Unit): Unit = {
    require(cases > 0, s"cases must be positive: $cases")
    (0 until cases).foreach { i =>
      val rng = new Random(seed + i)
      try body(rng)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed on case $i (seed ${seed + i}): ${e.getMessage}", e)
      }
    }
  }
}
