package repro

import org.scalacheck.{Prop, Test => SC}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck bridge: the scalatestplus adapter is not on the offline
  * classpath, so properties are run through ScalaCheck's own engine inside a
  * normal ScalaTest test.
  */
trait PropSpec extends AnyFunSuite {

  /** Register `p` as a test that must pass `minTests` generated cases. */
  def checkProp(name: String, minTests: Int = 60)(p: => Prop): Unit =
    test(name) {
      val res = SC.check(SC.Parameters.default.withMinSuccessfulTests(minTests), p)
      assert(res.passed, s"property failed: ${res.status}")
    }
}
