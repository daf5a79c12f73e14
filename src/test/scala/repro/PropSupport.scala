package repro

import org.scalacheck.{Gen, Prop, Test => SCTest}

/** ScalaCheck glue without the scalatestplus bridge (not in the offline
  * dependency set): run a Prop and surface failures as assertion errors.
  */
trait PropSupport {
  /** Check a ScalaCheck property with a fixed seed count. */
  def checkProp(prop: Prop, minSuccessful: Int = 100): Unit = {
    val params = SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val result = SCTest.check(params, prop)
    assert(result.passed, s"property failed: ${result.status}")
  }

  /** Deterministic ad-hoc trials for cases where hand-rolled generators are
    * clearer than Gen composition.
    */
  def trials(n: Int, seed: Long = 42)(body: scala.util.Random => Unit): Unit = {
    val rng = new scala.util.Random(seed)
    (0 until n).foreach(_ => body(rng))
  }

  /** Uniform vector generator shared by metric/diversity properties. */
  def vecGen(maxDim: Int = 8): Gen[Array[Double]] =
    Gen.choose(2, maxDim).flatMap(d => Gen.containerOfN[Array, Double](d, Gen.choose(-5.0, 5.0)))
}
