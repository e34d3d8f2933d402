package repro.testutil

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal property-test driver over ScalaCheck generators (the
  * scalatestplus bridge is not available offline; raw scalacheck is).
  * Deterministic: seeds derive from a fixed root.
  */
object Check {
  def forAll[A](gen: Gen[A], trials: Int = 60)(f: A => Unit): Unit = {
    val params = Gen.Parameters.default
    var seed = Seed(987654321L)
    var i = 0
    while (i < trials) {
      val a = gen.pureApply(params, seed)
      try f(a)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed on input: $a (trial $i)", e)
      }
      seed = seed.next
      i += 1
    }
  }
}
