package repro.core

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.Assertions._

/** Minimal ScalaCheck-to-ScalaTest bridge (the scalatestplus adapter
  * artifact is not in the offline cache).
  */
object Props {
  def hold(p: Prop, minTests: Int = 60): Unit = {
    val res = SCTest.check(
      SCTest.Parameters.default
        .withMinSuccessfulTests(minTests)
        .withInitialSeed(org.scalacheck.rng.Seed(42L)),
      p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
