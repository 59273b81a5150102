package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions

/** Minimal ScalaCheck bridge (the scalatestplus adapter is not in the
  * offline cache): run a Prop and fail the ScalaTest assertion on falsify.
  */
trait PropHelpers extends Assertions {

  /** Check `p` with `min` successful cases; fail the test otherwise. */
  def checkProp(p: Prop, min: Int = 200): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(min), p)
    assert(res.passed, s"property falsified: ${res.status}")
  }

  /** Seeded repeated-random driver for properties awkward to express as
    * ScalaCheck generators.
    */
  def forAllRandom(iters: Int = 200, seed: Long = 12345)(body: scala.util.Random => Unit): Unit = {
    val rnd = new scala.util.Random(seed)
    (0 until iters).foreach(_ => body(rnd))
  }
}
