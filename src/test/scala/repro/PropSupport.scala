package repro

import org.scalacheck.Gen
import org.scalacheck.rng.Seed

/** Minimal deterministic property-testing bridge.
  *
  * The offline image ships raw ScalaCheck but not the scalatestplus
  * integration, so suites sample generators explicitly: `forAllGen` draws
  * `trials` values from a `Gen` with fixed seeds and applies the assertion
  * block to each — deterministic across runs, and failures report the
  * offending sample.
  */
trait PropSupport {

  def forAllGen[A](gen: Gen[A], trials: Int = 60)(f: A => Unit): Unit = {
    var i = 0
    var drawn = 0
    // Iterate seeds until `trials` samples succeed generation (Gen.filter
    // can make individual draws fail).
    while (drawn < trials && i < trials * 20) {
      gen(Gen.Parameters.default, Seed(0xC0FFEE + i * 7919L)) match {
        case Some(a) =>
          drawn += 1
          try f(a)
          catch {
            case e: Throwable =>
              throw new AssertionError(s"property failed for sample #$drawn: $a", e)
          }
        case None => ()
      }
      i += 1
    }
    require(drawn == trials, s"generator too sparse: produced $drawn/$trials samples")
  }

  def forAllGen2[A, B](ga: Gen[A], gb: Gen[B], trials: Int = 60)(f: (A, B) => Unit): Unit =
    forAllGen(Gen.zip(ga, gb), trials) { case (a, b) => f(a, b) }
}
