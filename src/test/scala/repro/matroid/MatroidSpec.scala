package repro.matroid

import org.scalatest.funsuite.AnyFunSuite
import repro.{PropSupport, TestGen}
import repro.core.Element

/** Partition-matroid axioms and predicate semantics. */
class MatroidSpec extends AnyFunSuite with PropSupport {

  private def mkMatroid(xs: IndexedSeq[Element], caps: IndexedSeq[Int]): PartitionMatroid = {
    val groupOf = xs.map(e => e.id -> e.group).toMap
    new PartitionMatroid(xs, groupOf, caps)
  }

  for (seed <- 1 to 8) {
    test(s"hereditary property: subsets of independent sets are independent (seed $seed)") {
      val rng = new scala.util.Random(seed)
      val m = 2 + rng.nextInt(3)
      val caps = IndexedSeq.fill(m)(1 + rng.nextInt(2))
      val xs = TestGen.randomElements(10, m, 2, seed * 11L)
      val matroid = mkMatroid(xs, caps)
      // Build a maximal-ish independent set greedily, then check all subsets.
      val ind = xs.foldLeft(Vector.empty[Element]) { (acc, x) =>
        if (matroid.isIndependent(acc :+ x)) acc :+ x else acc
      }
      assert(matroid.isIndependent(ind))
      ind.indices.foreach(i => assert(matroid.isIndependent(ind.patch(i, Nil, 1))))
    }
  }

  for (seed <- 1 to 8) {
    test(s"augmentation property: |A| > |B| ⇒ ∃x ∈ A∖B with B+x independent (seed $seed)") {
      val rng = new scala.util.Random(seed * 3)
      val m = 2 + rng.nextInt(2)
      val caps = IndexedSeq.fill(m)(2)
      val xs = TestGen.randomElements(12, m, 2, seed * 17L, minPerGroup = 2)
      val matroid = mkMatroid(xs, caps)
      // Random independent sets A, B with |A| > |B|.
      def randomIndependent(maxSize: Int): Vector[Element] =
        rng.shuffle(xs).foldLeft(Vector.empty[Element]) { (acc, x) =>
          if (acc.size < maxSize && matroid.isIndependent(acc :+ x)) acc :+ x else acc
        }
      val a = randomIndependent(4)
      val b = randomIndependent(math.max(0, a.size - 1))
      if (a.size > b.size) {
        val candidates = a.filterNot(x => b.exists(_.id == x.id))
        assert(candidates.exists(x => matroid.isIndependent(b :+ x)),
          s"augmentation failed: A=${a.map(_.group)}, B=${b.map(_.group)}, caps=$caps")
      }
    }
  }

  test("empty set is independent") {
    val xs = TestGen.randomElements(5, 2, 2, 1)
    assert(mkMatroid(xs, IndexedSeq(1, 1)).isIndependent(Nil))
  }

  test("canAdd reflects per-part capacity exactly") {
    val xs = IndexedSeq(Element(0, 0, Array(0.0)), Element(1, 0, Array(1.0)), Element(2, 1, Array(2.0)))
    val matroid = mkMatroid(xs, IndexedSeq(1, 1))
    assert(matroid.canAdd(Set.empty[Long], xs(0)))
    assert(!matroid.canAdd(Set(0L), xs(1)), "group 0 cap 1 exhausted")
    assert(matroid.canAdd(Set(0L), xs(2)), "group 1 still open")
  }

  test("canSwap: same part ⇒ swappable, different part ⇒ not") {
    val xs = IndexedSeq(Element(0, 0, Array(0.0)), Element(1, 0, Array(1.0)), Element(2, 1, Array(2.0)))
    val matroid = mkMatroid(xs, IndexedSeq(1, 1))
    assert(matroid.canSwap(Set(0L, 2L), xs(1), xs(0)), "swap within group 0")
    assert(!matroid.canSwap(Set(0L, 2L), xs(1), xs(2)), "removing a group-1 element cannot fix group 0")
  }

  test("cluster matroid (caps all 1) admits at most one element per cluster") {
    val xs = TestGen.randomElements(8, 4, 2, 5)
    val clusterOf = xs.map(e => e.id -> (e.id % 3).toInt).toMap
    val matroid = new PartitionMatroid(xs, clusterOf, _ => 1)
    val byCluster = xs.groupBy(e => clusterOf(e.id))
    byCluster.values.filter(_.size >= 2).foreach { cl =>
      assert(!matroid.isIndependent(cl.take(2)))
      assert(matroid.isIndependent(cl.take(1)))
    }
  }
}
