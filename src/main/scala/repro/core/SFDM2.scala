package repro.core

import repro.matroid.{MatroidIntersection, PartitionMatroid}
import scala.collection.mutable

/** Algorithm 3 — SFDM2, the `(1-ε)/(3m+2)`-approximation streaming algorithm
  * for fair max-min diversity maximization with an arbitrary number m of
  * groups.
  *
  * Stream processing keeps, per guess µ: a group-blind candidate `S_µ` of
  * capacity k and m group-specific candidates `S_µ,i` of capacity k (note:
  * k, not k_i — the difference from SFDM1). Post-processing runs on
  * `U' = {µ : |S_µ|=k ∧ |S_µ,i| ≥ k_i ∀i}`: it extracts a partial solution
  * `S'_µ` from `S_µ` by truncating over-filled groups, single-linkage
  * clusters all stored elements at threshold µ/(m+1) (Lemma 3), and augments
  * `S'_µ` to a maximum-cardinality set in the intersection of the fairness
  * matroid M₁ and the cluster matroid M₂ via Algorithm 4.
  *
  * Stores O(km·logΔ/ε) elements; O(k·logΔ/ε) time per element (only the
  * blind and own-group candidates are touched); post-processing
  * O(k²m·logΔ/ε·(m + log²k)) (Theorem 5).
  */
final class SFDM2(
    ks: IndexedSeq[Int],
    eps: Double,
    bounds: DistanceBounds,
    metric: Metric,
) extends FdmState {
  require(ks.nonEmpty && ks.forall(_ >= 1), s"group quotas must all be ≥ 1, got $ks")
  val m: Int = ks.length
  val k: Int = ks.sum

  val guesses: Array[Double] = GuessLadder(bounds.dmin, bounds.dmax, eps)
  private val blind: Array[Candidate] = guesses.map(mu => new Candidate(k, mu, metric))
  private val grp: Array[Array[Candidate]] =
    Array.fill(m)(guesses.map(mu => new Candidate(k, mu, metric)))

  private var streamNs = 0L

  override def process(x: Element): Unit = {
    require(x.group >= 0 && x.group < m, s"group ${x.group} out of range [0,$m)")
    val t0 = System.nanoTime()
    val g = grp(x.group)
    var j = 0
    while (j < guesses.length) {
      blind(j).tryAdd(x)
      g(j).tryAdd(x)
      j += 1
    }
    streamNs += System.nanoTime() - t0
  }

  override def contents: IndexedSeq[Element] = {
    val seen = mutable.LinkedHashMap.empty[Long, Element]
    blind.foreach(_.elements.foreach(e => seen.getOrElseUpdate(e.id, e)))
    grp.foreach(_.foreach(_.elements.foreach(e => seen.getOrElseUpdate(e.id, e))))
    seen.values.toIndexedSeq
  }

  /** Single-linkage clustering of `sAll` at threshold µ/(m+1) (Lines 13–16)
    * via union-find. Returns a cluster id per element id.
    */
  private[core] def clusterIds(sAll: IndexedSeq[Element], mu: Double): Map[Long, Int] = {
    val thr = mu / (m + 1)
    val parent = Array.tabulate(sAll.length)(identity)
    def find(a: Int): Int = { var r = a; while (parent(r) != r) r = parent(r); var c = a; while (parent(c) != c) { val nx = parent(c); parent(c) = r; c = nx }; r }
    def union(a: Int, b: Int): Unit = { val ra = find(a); val rb = find(b); if (ra != rb) parent(rb) = ra }
    var i = 0
    while (i < sAll.length) {
      var j = i + 1
      while (j < sAll.length) {
        if (metric.dist(sAll(i), sAll(j)) < thr) union(i, j)
        j += 1
      }
      i += 1
    }
    sAll.indices.map(i => sAll(i).id -> find(i)).toMap
  }

  /** Post-process one guess: initial partial solution, clusters, matroid
    * intersection (Lines 11–18). Returns the augmented set (fair iff size k).
    */
  private def postProcess(j: Int): Vector[Element] = {
    val mu = guesses(j)
    // Line 11: from each group keep min(k_i, count) elements of S_µ (arbitrary
    // choice allowed — insertion order kept for determinism).
    val byGroup = blind(j).elements.groupBy(_.group)
    val sPrime = (0 until m).flatMap { i =>
      byGroup.getOrElse(i, IndexedSeq.empty).take(ks(i))
    }.toVector
    // Line 12: S_all = all candidates at this guess, dedup by id.
    val seen = mutable.LinkedHashMap.empty[Long, Element]
    grp.foreach(_(j).elements.foreach(e => seen.getOrElseUpdate(e.id, e)))
    blind(j).elements.foreach(e => seen.getOrElseUpdate(e.id, e))
    val sAll = seen.values.toIndexedSeq
    // Lines 13–16: clusters.
    val cid = clusterIds(sAll, mu)
    // Line 17: M1 = fairness partition matroid, M2 = cluster partition matroid.
    val groupOf = sAll.map(e => e.id -> e.group).toMap
    val m1 = new PartitionMatroid(sAll, id => groupOf(id), i => ks(i))
    val m2 = new PartitionMatroid(sAll, id => cid(id), _ => 1)
    // Defensive: Lemma 3(ii) guarantees S'_µ ∈ I₂; enforce it anyway so a
    // pathological guess can never crash the augmentation.
    val s0 = mutable.ArrayBuffer.empty[Element]
    val usedCluster = mutable.Set.empty[Int]
    sPrime.foreach { e => if (usedCluster.add(cid(e.id))) s0 += e }
    // Line 18 / Algorithm 4.
    MatroidIntersection.augmentToMax(m1, m2, metric, s0.toVector)
  }

  override def finish(): FdmResult = {
    val t0 = System.nanoTime()
    val uPrime = guesses.indices.filter { j =>
      blind(j).size == k && (0 until m).forall(i => grp(i)(j).size >= ks(i))
    }
    val fairSets = uPrime.map(postProcess).filter(_.size == k)
    val best =
      if (fairSets.nonEmpty) fairSets.maxBy(Diversity.div(_, metric))
      else fallback()
    val post = System.nanoTime() - t0
    FdmResult(best, Diversity.div(best, metric), storedElementCount, streamNs, post)
  }

  /** Degenerate case (no guess yielded a full fair set): best-effort fair set
    * from the group-specific candidates at the most-populated guess.
    */
  private def fallback(): Vector[Element] = {
    val j = guesses.indices.minBy(j => -(0 until m).map(i => math.min(grp(i)(j).size, ks(i))).sum)
    (0 until m).flatMap(i => grp(i)(j).elements.take(ks(i))).toVector
  }
}
