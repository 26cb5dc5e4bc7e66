package repro

import org.scalacheck.{Gen, Prop, Test => ScTest}

/** Minimal ScalaCheck bridge (the scalatestplus adapter is not in the
  * offline cache): run a property and assert it passed.
  */
trait PropSupport {

  def checkProp(p: Prop, minSuccessful: Int = 100): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val res = ScTest.check(params, p)
    assert(res.passed, s"property failed: ${res.status}")
  }

  def forAllGen[A](gen: Gen[A], minSuccessful: Int = 100)(body: A => Unit): Unit =
    checkProp(Prop.forAll(gen) { a => body(a); true }, minSuccessful)
}
