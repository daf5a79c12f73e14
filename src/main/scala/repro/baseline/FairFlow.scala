package repro.baseline

import repro.core.{Element, Metric}
import repro.flow.MaxFlow
import scala.collection.mutable

/** FairFlow [32] — the offline 1/(3m-1)-approximation for fair max-min
  * diversity maximization with arbitrary m, reimplemented from the
  * description in [32] and §IV-B of this paper (no reference implementation
  * is available in this container; see DESIGN.md).
  *
  * Shape of the algorithm: guess a diversity target τ (descending geometric
  * ladder seeded by 2·div(GMM) ≥ OPT_f); build a δ-net clustering of the
  * *whole* dataset at δ = τ/(m+1); route a unit of flow per solution slot
  * through a source → group (cap k_i) → cluster (∋ that group, cap 1) → sink
  * network; the first τ whose max flow saturates all k slots yields the
  * solution — an *arbitrary* representative per selected (group, cluster)
  * pair, which is exactly why FairFlow's solution quality degrades with m
  * (threshold ∝ 1/m, no greedy selection), matching Table II's shape.
  *
  * O(n) memory over the full dataset and O(n·#clusters) time per guess — the
  * offline inefficiency the paper's streaming algorithms eliminate.
  */
object FairFlow {

  /** @param decay multiplicative step of the descending τ ladder */
  def run(xs: IndexedSeq[Element], ks: IndexedSeq[Int], metric: Metric, decay: Double = 0.9): Vector[Element] = {
    val m = ks.length
    val k = ks.sum
    require(xs.nonEmpty && m >= 1 && ks.forall(_ >= 1))
    val groupSizes = Array.tabulate(m)(i => xs.count(_.group == i))
    require((0 until m).forall(i => groupSizes(i) >= ks(i)), "quotas infeasible")

    val gmm = GMM.run(xs, math.min(k, xs.length), metric)
    var tau = 2 * repro.core.Diversity.div(gmm, metric)
    if (!tau.isFinite || tau <= 0) tau = 1.0
    var attempt = 0
    while (attempt < 200) {
      val delta = tau / (m + 1)
      solveAt(xs, ks, metric, delta) match {
        case Some(sol) => return sol
        case None      => tau *= decay; attempt += 1
      }
    }
    // δ below d_min makes every point its own cluster, where feasibility is
    // guaranteed by the quota check above — so this is unreachable.
    throw new IllegalStateException("FairFlow: no feasible threshold found")
  }

  /** One guess: δ-net clustering + flow assignment. */
  private def solveAt(xs: IndexedSeq[Element], ks: IndexedSeq[Int], metric: Metric, delta: Double): Option[Vector[Element]] = {
    val m = ks.length
    val k = ks.sum
    // Greedy δ-net: a point within δ of an existing center joins that
    // cluster, otherwise it becomes a new center.
    val centers = mutable.ArrayBuffer.empty[Element]
    // representative element per (cluster, group), first-seen.
    val rep = mutable.Map.empty[(Int, Int), Element]
    xs.foreach { x =>
      var best = -1
      var bestD = Double.PositiveInfinity
      var c = 0
      while (c < centers.length) {
        val d = metric.dist(x, centers(c))
        if (d < bestD) { bestD = d; best = c }
        c += 1
      }
      val cluster =
        if (best >= 0 && bestD < delta) best
        else { centers += x; centers.length - 1 }
      rep.getOrElseUpdate((cluster, x.group), x)
    }
    val nClusters = centers.length
    // Nodes: 0 = source, 1..m = groups, m+1..m+nClusters = clusters, last = sink.
    val src = 0
    val sink = m + nClusters + 1
    val flow = new MaxFlow(sink + 1)
    (0 until m).foreach(i => flow.addEdge(src, 1 + i, ks(i)))
    rep.keys.foreach { case (cluster, g) => flow.addEdge(1 + g, m + 1 + cluster, 1) }
    (0 until nClusters).foreach(c => flow.addEdge(m + 1 + c, sink, 1))
    if (flow.maxflow(src, sink) < k) None
    else {
      val sol = Vector.newBuilder[Element]
      (0 until m).foreach { g =>
        flow.outgoingFlows(1 + g).foreach { case (clusterNode, f) =>
          if (f > 0) sol += rep((clusterNode - m - 1, g))
        }
      }
      Some(sol.result())
    }
  }
}
