package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{PropSupport, TestGen}

/** Guess-ladder construction and d_min/d_max bound estimation. */
class GuessLadderSpec extends AnyFunSuite with PropSupport {

  test("ladder starts at dmin, stays within [dmin, dmax], geometric with ratio 1/(1-ε)") {
    val u = GuessLadder(1.0, 100.0, 0.1)
    assert(u.head == 1.0)
    assert(u.forall(mu => mu >= 1.0 && mu <= 100.0))
    u.sliding(2).foreach { case Array(a, b) => assert(math.abs(b / a - 1 / 0.9) < 1e-9); case _ => }
  }

  test("ladder size matches O(logΔ/ε) closed form") {
    for (eps <- Seq(0.05, 0.1, 0.25); delta <- Seq(10.0, 1000.0)) {
      val u = GuessLadder(1.0, delta, eps)
      val expected = math.floor(math.log(delta) / -math.log(1 - eps)).toInt + 1
      assert(math.abs(u.length - expected) <= 1, s"eps=$eps delta=$delta got ${u.length} want ~$expected")
    }
  }

  test("degenerate ladder: dmin == dmax yields a single guess") {
    assert(GuessLadder(2.5, 2.5, 0.1).toSeq == Seq(2.5))
  }

  test("ladder rejects invalid parameters") {
    intercept[IllegalArgumentException](GuessLadder(0.0, 1.0, 0.1))
    intercept[IllegalArgumentException](GuessLadder(2.0, 1.0, 0.1))
    intercept[IllegalArgumentException](GuessLadder(1.0, 2.0, 0.0))
    intercept[IllegalArgumentException](GuessLadder(1.0, 2.0, 1.0))
  }

  test("every value in [dmin, dmax] has a ladder point within factor 1/(1-ε) below it") {
    val eps = 0.1
    val u = GuessLadder(0.5, 50.0, eps)
    trials(200) { rng =>
      val target = 0.5 + rng.nextDouble() * 49.5
      val below = u.filter(_ <= target)
      assert(below.nonEmpty && below.max >= target * (1 - eps) - 1e-12)
    }
  }

  test("DistanceBounds.exact brackets all pairwise distances") {
    trials(20) { rng =>
      val xs = TestGen.randomElements(12, 1, 3, rng.nextLong())
      val b = DistanceBounds.exact(xs, Euclidean)
      for (i <- xs.indices; j <- i + 1 until xs.length) {
        val d = Euclidean.dist(xs(i), xs(j))
        assert(d >= b.dmin - 1e-12 && d <= b.dmax + 1e-12)
      }
    }
  }

  test("DistanceBounds.estimate brackets the exact bounds (dmin ≤ exact.dmin·…, dmax ≥ exact.dmax)") {
    trials(20) { rng =>
      val xs = TestGen.randomElements(60, 1, 3, rng.nextLong())
      val exact = DistanceBounds.exact(xs, Euclidean)
      val est = DistanceBounds.estimate(xs, Euclidean, sampleSize = 60)
      assert(est.dmax >= exact.dmax - 1e-12, "pivot bound must dominate the true dmax")
      assert(est.dmin <= exact.dmin + 1e-12, "sampled dmin/2 must sit at or below the true dmin when the sample is exhaustive")
    }
  }

  test("DistanceBounds.estimate is deterministic") {
    val xs = TestGen.randomElements(100, 1, 4, 99)
    assert(DistanceBounds.estimate(xs, Manhattan) == DistanceBounds.estimate(xs, Manhattan))
  }

  test("DistanceBounds rejects degenerate input") {
    intercept[IllegalArgumentException](DistanceBounds(0.0, 1.0))
    intercept[IllegalArgumentException](DistanceBounds(2.0, 1.0))
    val same = IndexedSeq(Element(0, 0, Array(1.0)), Element(1, 0, Array(1.0)))
    intercept[IllegalArgumentException](DistanceBounds.exact(same, Euclidean))
  }

  test("delta = dmax/dmin") {
    assert(math.abs(DistanceBounds(0.5, 50.0).delta - 100.0) < 1e-12)
  }
}
