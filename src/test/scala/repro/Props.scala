package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck↔ScalaTest bridge (the scalatestplus adapter is not
  * in the offline dependency set). `check` runs a property and fails the
  * surrounding test with the ScalaCheck diagnostics on falsification.
  */
object Props {
  def check(p: Prop, minTests: Int = 60): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res = SCTest.check(params, p)
    assert(res.passed, s"property falsified: ${res.status}")
  }
}
