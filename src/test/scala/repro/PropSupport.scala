package repro

import org.scalacheck.{Prop, Test => SCTest}

/** Minimal ScalaCheck runner for use inside ScalaTest suites (the
  * scalatestplus bridge artifact is not in the offline cache).
  */
trait PropSupport {
  def check(prop: Prop, minSuccessful: Int = 50): Unit = {
    val res = SCTest.check(
      SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful).withInitialSeed(7L), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
