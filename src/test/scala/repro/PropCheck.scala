package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check helper.
  *
  * The scalatest<->scalacheck bridge artifact is not in the offline cache,
  * so suites sample generators directly: `n` deterministic samples per
  * property, seeded by index. A discarded (None) sample is skipped.
  */
object PropCheck {
  def forAllG[A](gen: Gen[A], n: Int = 100, seed: Long = 7)(body: A => Unit): Unit = {
    var checked = 0
    (0 until n * 3).iterator.takeWhile(_ => checked < n).foreach { i =>
      gen.apply(Gen.Parameters.default, Seed(seed + i)).foreach { a =>
        checked += 1
        try body(a)
        catch {
          case e: Throwable =>
            throw new AssertionError(s"property failed for sample #$checked: $a", e)
        }
      }
    }
    require(checked > 0, "generator produced no samples")
  }
}
