package repro

import org.scalacheck.{Gen, Prop, Test => SCTest}

/** Minimal ScalaCheck-in-ScalaTest glue (the scalatestplus bridge artifact
  * is not available offline): run a property with fixed parameters and
  * surface failures as assertion errors.
  */
object PropSupport {
  private val params = SCTest.Parameters.default
    .withMinSuccessfulTests(200)
    .withInitialSeed(org.scalacheck.rng.Seed(42L))

  private def run(prop: Prop): Unit = {
    val res = SCTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }

  def checkProp[A](g: Gen[A])(f: A => Boolean): Unit =
    run(Prop.forAll(g)(f))

  def checkProp[A, B](ga: Gen[A], gb: Gen[B])(f: (A, B) => Boolean): Unit =
    run(Prop.forAll(ga, gb)(f))

  def checkProp[A, B, C](ga: Gen[A], gb: Gen[B], gc: Gen[C])(f: (A, B, C) => Boolean): Unit =
    run(Prop.forAll(ga, gb, gc)(f))
}
