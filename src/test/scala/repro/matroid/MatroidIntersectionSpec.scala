package repro.matroid

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGen
import repro.core.{Element, Euclidean}

/** Algorithm 4 vs brute-force maximum common independent set. */
class MatroidIntersectionSpec extends AnyFunSuite {

  /** Random pair of partition matroids over the same small ground set. */
  private def instance(seed: Int): (IndexedSeq[Element], PartitionMatroid, PartitionMatroid) = {
    val rng = new scala.util.Random(seed)
    val m = 2 + rng.nextInt(3)
    val xs = TestGen.randomElements(7 + rng.nextInt(4), m, 2, seed * 13L)
    val caps1 = IndexedSeq.fill(m)(1 + rng.nextInt(2))
    val groupOf = xs.map(e => e.id -> e.group).toMap
    val nClusters = 3 + rng.nextInt(3)
    val clusterOf = xs.map(e => e.id -> rng.nextInt(nClusters)).toMap
    val m1 = new PartitionMatroid(xs, groupOf, caps1)
    val m2 = new PartitionMatroid(xs, clusterOf, _ => 1)
    (xs, m1, m2)
  }

  private def bruteMaxCommon(xs: IndexedSeq[Element], m1: Matroid, m2: Matroid): Int =
    (0 to xs.length).reverse.collectFirst {
      case k if xs.combinations(k).exists(c => m1.isIndependent(c) && m2.isIndependent(c)) => k
    }.getOrElse(0)

  for (seed <- 1 to 20) {
    test(s"augmentToMax from ∅ reaches the brute-force maximum cardinality (seed $seed)") {
      val (xs, m1, m2) = instance(seed)
      val result = MatroidIntersection.augmentToMax(m1, m2, Euclidean, Vector.empty)
      assert(m1.isIndependent(result) && m2.isIndependent(result), "result must be common independent")
      assert(result.map(_.id).distinct.size == result.size, "no duplicates")
      val brute = bruteMaxCommon(xs, m1, m2)
      assert(result.size == brute, s"got ${result.size}, brute force says $brute")
    }
  }

  for (seed <- 1 to 10) {
    test(s"augmentToMax from a nonempty partial solution still reaches the maximum (seed $seed)") {
      val (xs, m1, m2) = instance(seed + 1000)
      // Greedy partial common independent set as the starting point.
      val s0 = xs.foldLeft(Vector.empty[Element]) { (acc, x) =>
        if (acc.size < 2 && m1.isIndependent(acc :+ x) && m2.isIndependent(acc :+ x)) acc :+ x else acc
      }
      val result = MatroidIntersection.augmentToMax(m1, m2, Euclidean, s0)
      assert(m1.isIndependent(result) && m2.isIndependent(result))
      assert(result.size == bruteMaxCommon(xs, m1, m2))
    }
  }

  test("identical matroids: intersection is just the matroid rank") {
    val xs = TestGen.randomElements(8, 2, 2, 5, minPerGroup = 3)
    val groupOf = xs.map(e => e.id -> e.group).toMap
    val m1 = new PartitionMatroid(xs, groupOf, IndexedSeq(2, 2))
    val result = MatroidIntersection.augmentToMax(m1, m1, Euclidean, Vector.empty)
    assert(result.size == 4)
  }

  test("disjoint capacity zero part blocks everything") {
    val xs = TestGen.randomElements(6, 2, 2, 9, minPerGroup = 2)
    val groupOf = xs.map(e => e.id -> e.group).toMap
    val m1 = new PartitionMatroid(xs, groupOf, IndexedSeq(0, 0))
    val m2 = new PartitionMatroid(xs, _ => 0, _ => 10)
    val result = MatroidIntersection.augmentToMax(m1, m2, Euclidean, Vector.empty)
    assert(result.isEmpty)
  }

  test("greedy phase picks farthest-first (diversity-aware augmentation)") {
    // Line of points, all in distinct clusters/groups of cap 1 each: the
    // first two picks must be the extremes (0 and 9), like GMM.
    val xs = (0 until 10).map(i => Element(i.toLong, i, Array(i.toDouble)))
    val m1 = new PartitionMatroid(xs, id => id.toInt, _ => 1)
    val m2 = new PartitionMatroid(xs, id => id.toInt, _ => 1)
    val result = MatroidIntersection.augmentToMax(m1, m2, Euclidean, Vector.empty)
    assert(result.size == 10)
    val firstTwo = result.take(2).map(_.id).toSet
    assert(firstTwo.contains(9L) || firstTwo.contains(0L))
  }
}
