package repro.flow

import org.scalatest.funsuite.AnyFunSuite

/** Edmonds–Karp substrate vs known values and brute-force bipartite matching. */
class MaxFlowSpec extends AnyFunSuite {

  test("single edge") {
    val f = new MaxFlow(2)
    f.addEdge(0, 1, 5)
    assert(f.maxflow(0, 1) == 5)
  }

  test("two disjoint paths sum") {
    val f = new MaxFlow(4)
    f.addEdge(0, 1, 3); f.addEdge(1, 3, 3)
    f.addEdge(0, 2, 4); f.addEdge(2, 3, 2)
    assert(f.maxflow(0, 3) == 5)
  }

  test("bottleneck limits flow") {
    val f = new MaxFlow(4)
    f.addEdge(0, 1, 10); f.addEdge(1, 2, 1); f.addEdge(2, 3, 10)
    assert(f.maxflow(0, 3) == 1)
  }

  test("classic CLRS-style network") {
    val f = new MaxFlow(6)
    f.addEdge(0, 1, 16); f.addEdge(0, 2, 13)
    f.addEdge(1, 3, 12); f.addEdge(2, 1, 4); f.addEdge(2, 4, 14)
    f.addEdge(3, 2, 9); f.addEdge(3, 5, 20); f.addEdge(4, 3, 7); f.addEdge(4, 5, 4)
    assert(f.maxflow(0, 5) == 23)
  }

  test("requires residual (back-edge) augmentation") {
    // The greedy forward-only answer is 1; true max flow is 2.
    val f = new MaxFlow(4)
    f.addEdge(0, 1, 1); f.addEdge(0, 2, 1)
    f.addEdge(1, 2, 1); f.addEdge(1, 3, 1); f.addEdge(2, 3, 1)
    assert(f.maxflow(0, 3) == 2)
  }

  test("disconnected sink gives zero flow") {
    val f = new MaxFlow(3)
    f.addEdge(0, 1, 7)
    assert(f.maxflow(0, 2) == 0)
  }

  test("outgoingFlows reports the per-edge assignment") {
    val f = new MaxFlow(4)
    f.addEdge(0, 1, 2)
    f.addEdge(1, 2, 1); f.addEdge(1, 3, 1)
    f.addEdge(2, 3, 1)
    assert(f.maxflow(0, 3) == 2)
    val flows = f.outgoingFlows(1).toMap
    assert(flows.getOrElse(2, 0) == 1 && flows.getOrElse(3, 0) == 1)
  }

  test("rejects negative capacity") {
    intercept[IllegalArgumentException](new MaxFlow(2).addEdge(0, 1, -1))
  }

  /** Brute-force maximum bipartite matching by recursion. */
  private def bruteMatching(left: Int, right: Int, edges: Set[(Int, Int)]): Int = {
    def rec(l: Int, usedRight: Set[Int]): Int =
      if (l == left) 0
      else {
        val skip = rec(l + 1, usedRight)
        val take = (0 until right)
          .filter(r => edges((l, r)) && !usedRight(r))
          .map(r => 1 + rec(l + 1, usedRight + r))
        (skip +: take).max
      }
    rec(0, Set.empty)
  }

  for (seed <- 1 to 12) {
    test(s"random bipartite matching equals brute force (seed $seed)") {
      val rng = new scala.util.Random(seed)
      val (l, r) = (2 + rng.nextInt(4), 2 + rng.nextInt(4))
      val edges = (for (a <- 0 until l; b <- 0 until r if rng.nextDouble() < 0.4) yield (a, b)).toSet
      // Nodes: 0 source, 1..l left, l+1..l+r right, l+r+1 sink.
      val f = new MaxFlow(l + r + 2)
      (0 until l).foreach(a => f.addEdge(0, 1 + a, 1))
      edges.foreach { case (a, b) => f.addEdge(1 + a, l + 1 + b, 1) }
      (0 until r).foreach(b => f.addEdge(l + 1 + b, l + r + 1, 1))
      assert(f.maxflow(0, l + r + 1) == bruteMatching(l, r, edges))
    }
  }
}
