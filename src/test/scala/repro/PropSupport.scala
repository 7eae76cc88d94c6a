package repro

import org.scalacheck.{Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** Minimal ScalaCheck/ScalaTest bridge (the `scalatestplus` artifact is not
  * available offline). `checkProp` registers a test that runs a ScalaCheck
  * property with a fixed seed so failures are reproducible.
  */
trait PropSupport { this: AnyFunSuite =>
  def checkProp(name: String, minTests: Int = 50)(p: => Prop): Unit = test(name) {
    val params = SCTest.Parameters.default
      .withMinSuccessfulTests(minTests)
      .withInitialSeed(org.scalacheck.rng.Seed(12345L))
    val res = SCTest.check(params, p)
    assert(res.passed, s"property failed: ${res.status}")
  }
}
