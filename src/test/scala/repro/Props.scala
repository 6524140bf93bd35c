package repro

import org.scalacheck.{Prop, Test => ScTest}

/** Minimal ScalaCheck runner for use inside ScalaTest suites (the
  * scalatestplus bridge artifact is not in the offline cache).
  */
object Props {
  def check(p: Prop, minTests: Int = 100): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minTests)
    val res    = ScTest.check(params, p)
    if (!res.passed) throw new AssertionError(s"property failed: ${res.status}")
  }
}
