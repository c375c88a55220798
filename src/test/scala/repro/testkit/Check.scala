package repro.testkit

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-check driver: only scalatest and
  * scalacheck-core are available offline (no scalatestplus bridge), so we
  * sample generators with fixed seeds and delegate assertions to the
  * enclosing ScalaTest suite. Failures report the seed index.
  */
object Check {
  def forAll[A](gen: Gen[A], n: Int = 30)(body: A => Unit): Unit = {
    var i = 0
    while (i < n) {
      val a = gen.pureApply(Gen.Parameters.default, Seed(i.toLong * 7919 + 1))
      try body(a)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed at sample #$i: ${e.getMessage}", e)
      }
      i += 1
    }
  }
}
