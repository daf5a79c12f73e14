package repro.flow

import scala.collection.mutable

/** Minimal integral max-flow (Edmonds–Karp: BFS augmenting paths) — the
  * substrate the FairFlow baseline [32] needs for its group→cluster
  * assignment. Capacities in FairFlow are O(k), and the flow value is ≤ k,
  * so at most k BFS passes run: O(k·E) total.
  */
final class MaxFlow(n: Int) {
  private final class Edge(val to: Int, var cap: Int, val rev: Int, val forward: Boolean)
  private val adj = Array.fill(n)(mutable.ArrayBuffer.empty[Edge])

  /** Add a directed edge `u → v` with integer capacity `cap`. */
  def addEdge(u: Int, v: Int, cap: Int): Unit = {
    require(cap >= 0, s"negative capacity $cap")
    adj(u) += new Edge(v, cap, adj(v).length, forward = true)
    adj(v) += new Edge(u, 0, adj(u).length - 1, forward = false)
  }

  /** Maximum s→t flow; afterwards [[outgoingFlows]] reads per-edge flows. */
  def maxflow(s: Int, t: Int): Int = {
    var total = 0
    var augmenting = true
    while (augmenting) {
      // BFS for a shortest residual path.
      val prevNode = Array.fill(n)(-1)
      val prevEdge = Array.fill(n)(-1)
      prevNode(s) = s
      val q = mutable.Queue(s)
      while (q.nonEmpty && prevNode(t) == -1) {
        val u = q.dequeue()
        var i = 0
        while (i < adj(u).length) {
          val e = adj(u)(i)
          if (e.cap > 0 && prevNode(e.to) == -1) {
            prevNode(e.to) = u; prevEdge(e.to) = i; q += e.to
          }
          i += 1
        }
      }
      if (prevNode(t) == -1) augmenting = false
      else {
        var v = t; var bottleneck = Int.MaxValue
        while (v != s) {
          val e = adj(prevNode(v))(prevEdge(v))
          bottleneck = math.min(bottleneck, e.cap)
          v = prevNode(v)
        }
        v = t
        while (v != s) {
          val e = adj(prevNode(v))(prevEdge(v))
          e.cap -= bottleneck
          adj(e.to)(e.rev).cap += bottleneck
          v = prevNode(v)
        }
        total += bottleneck
      }
    }
    total
  }

  /** `(target, pushedFlow)` for every forward edge out of `u` carrying flow.
    * The flow on a forward edge equals the residual capacity accumulated on
    * its reverse edge (which started at 0).
    */
  def outgoingFlows(u: Int): Seq[(Int, Int)] =
    adj(u).toSeq.collect {
      case e if e.forward && adj(e.to)(e.rev).cap > 0 => (e.to, adj(e.to)(e.rev).cap)
    }
}
