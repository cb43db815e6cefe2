package repro

import org.scalacheck.Prop
import org.scalacheck.Test.{check, Parameters}

/** Minimal ScalaCheck bridge (the scalatestplus adapter is not on the
  * offline classpath): run a property and assert it passed.
  */
trait PropSupport {
  def checkProp(p: Prop, minTests: Int = 100): Unit = {
    val res = check(Parameters.default.withMinSuccessfulTests(minTests), p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
