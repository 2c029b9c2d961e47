package repro

import org.scalacheck.{Gen, Prop, Test => SchkTest}
import org.scalatest.funsuite.AnyFunSuite

/** Minimal ScalaCheck ↔ ScalaTest bridge (the scalatestplus artifact is not
  * in the offline cache). `forAllG(gen) { a => ...assertions... }` runs the
  * property under ScalaCheck's driver and fails the surrounding test with
  * the first counterexample.
  */
trait PropSupport { self: AnyFunSuite =>

  def checkProp(p: Prop, minTests: Int = 50): Unit = {
    val res = SchkTest.check(SchkTest.Parameters.default.withMinSuccessfulTests(minTests), p)
    assert(res.passed, s"property failed: ${res.status}")
  }

  def forAllG[A](g: Gen[A])(f: A => Unit): Unit =
    checkProp(Prop.forAll(g) { a => f(a); true })

  def forAllG2[A, B](ga: Gen[A], gb: Gen[B])(f: (A, B) => Unit): Unit =
    checkProp(Prop.forAll(ga, gb) { (a, b) => f(a, b); true })
}
