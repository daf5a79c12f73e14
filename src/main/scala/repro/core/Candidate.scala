package repro.core

import scala.collection.mutable.ArrayBuffer

/** One per-guess candidate set `S_µ`: a bounded, insert-only µ-separated set.
  *
  * An element is admitted iff the candidate is below capacity and its distance
  * to every stored element is at least µ (Lines 5–6 of Algorithm 1). The
  * invariant `div(S_µ) ≥ µ` therefore holds at all times, which Theorem 1 and
  * Lemmas 1–4 rely on.
  *
  * @param cap    capacity (k for group-blind and SFDM2 group candidates,
  *               k_i for SFDM1 group candidates)
  * @param mu     separation threshold, one guess of OPT
  * @param metric distance metric
  */
final class Candidate(val cap: Int, val mu: Double, metric: Metric) extends Serializable {
  private val buf = new ArrayBuffer[Element](math.min(cap, 64))

  /** Stored elements in insertion order (read-only view). */
  def elements: IndexedSeq[Element] = buf.toIndexedSeq

  def size: Int = buf.length
  def isFull: Boolean = buf.length >= cap

  /** `d(x, S_µ)`; +∞ when empty so the first element is always admitted. */
  def distTo(x: Element): Double = {
    var best = Double.PositiveInfinity
    var i = 0
    while (i < buf.length) {
      val d = metric.dist(x, buf(i))
      if (d < best) {
        best = d
        if (best < mu) return best // early exit: rejection already decided
      }
      i += 1
    }
    best
  }

  /** Attempt one streaming insertion; returns true iff x was stored. */
  def tryAdd(x: Element): Boolean = {
    if (isFull) false
    else if (distTo(x) >= mu) { buf += x; true }
    else false
  }
}
