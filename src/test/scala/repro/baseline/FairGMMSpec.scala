package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGen
import repro.core.{Diversity, Element, Euclidean}

/** FairGMM (offline, small k/m): fairness, quality, and the scalability guard. */
class FairGMMSpec extends AnyFunSuite {

  for (seed <- 1 to 8) {
    test(s"fairness and no duplicates (seed $seed)") {
      val rng = new scala.util.Random(seed)
      val ks = IndexedSeq(1 + rng.nextInt(2), 1 + rng.nextInt(2))
      val xs = TestGen.randomElements(16, 2, 2, seed * 37L, minPerGroup = 3)
      val sol = FairGMM.run(xs, ks, Euclidean)
      assert(sol.count(_.group == 0) == ks(0) && sol.count(_.group == 1) == ks(1))
      assert(sol.map(_.id).distinct.size == ks.sum)
    }
  }

  for (seed <- 1 to 8) {
    test(s"quality ≥ 1/5 · OPT_f — and in practice near-optimal (seed $seed)") {
      val ks = IndexedSeq(2, 2)
      val xs = TestGen.randomElements(12, 2, 2, seed * 41L, minPerGroup = 3)
      val optF = Diversity.bruteForceFairOpt(xs, ks, Euclidean)
      val d = Diversity.div(FairGMM.run(xs, ks, Euclidean), Euclidean)
      assert(d >= optF / 5 - 1e-9)
    }
  }

  test("when pools cover the whole group, FairGMM is exactly optimal") {
    // Each group has ≤ k elements, so the GMM pools are the full groups and
    // enumeration is exhaustive over all fair solutions.
    val xs = TestGen.randomElements(8, 2, 2, 11, minPerGroup = 3)
    val ks = IndexedSeq(2, 2)
    val optF = Diversity.bruteForceFairOpt(xs, ks, Euclidean)
    val d = Diversity.div(FairGMM.run(xs, ks, Euclidean), Euclidean)
    assert(math.abs(d - optF) < 1e-9)
  }

  test("three groups") {
    val xs = TestGen.randomElements(18, 3, 2, 21, minPerGroup = 3)
    val sol = FairGMM.run(xs, IndexedSeq(1, 2, 1), Euclidean)
    assert(sol.groupBy(_.group).view.mapValues(_.size).toMap == Map(0 -> 1, 1 -> 2, 2 -> 1))
  }

  test("scalability guard rejects oversized enumerations (paper: k>10, m>5 infeasible)") {
    val xs = TestGen.randomElements(200, 8, 2, 31, minPerGroup = 12)
    intercept[IllegalArgumentException](
      FairGMM.run(xs, IndexedSeq.fill(8)(10), Euclidean, maxCombos = 1000))
  }

  test("rejects infeasible quotas") {
    val xs = IndexedSeq(Element(0, 0, Array(0.0)), Element(1, 1, Array(1.0)))
    intercept[IllegalArgumentException](FairGMM.run(xs, IndexedSeq(2, 1), Euclidean))
  }
}
