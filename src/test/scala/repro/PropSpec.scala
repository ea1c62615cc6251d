package repro

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Lightweight property-testing base: deterministic seeded trials.
  *
  * scalatestplus-scalacheck is not in the offline cache, so property-style
  * tests run as fixed-seed loops — same coverage intent, fully reproducible.
  */
trait PropSpec extends AnyFunSuite {
  val trials: Int = 50

  def forSeeds(n: Int = trials)(body: Random => Unit): Unit =
    (0 until n).foreach { s =>
      try body(new Random(s.toLong))
      catch {
        case e: org.scalatest.exceptions.TestFailedException =>
          throw new org.scalatest.exceptions.TestFailedException(
            s"seed=$s: ${e.getMessage}", e, 0)
      }
    }
}
