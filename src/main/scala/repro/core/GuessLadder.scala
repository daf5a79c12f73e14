package repro.core

/** The geometric guess ladder `U = { d_min/(1-ε)^j : j ≥ 0 } ∩ [d_min, d_max]`
  * used by Algorithms 1–3 to guess OPT within relative error 1-ε, plus the
  * distance-bound estimation the paper leaves implicit.
  */
object GuessLadder {

  /** Safety cap on |U|; `log Δ / ε` stays far below this for any sane input,
    * so hitting it indicates corrupt bounds (dmin ≈ 0).
    */
  val MaxGuesses = 100000

  /** Ascending guesses in `[dmin, dmax]`. */
  def apply(dmin: Double, dmax: Double, eps: Double): Array[Double] = {
    require(dmin > 0, s"dmin must be positive, got $dmin")
    require(dmax >= dmin, s"dmax ($dmax) < dmin ($dmin)")
    require(eps > 0 && eps < 1, s"eps must be in (0,1), got $eps")
    val buf = Array.newBuilder[Double]
    var mu = dmin
    var j = 0
    while (mu <= dmax && j < MaxGuesses) {
      buf += mu
      j += 1
      mu = dmin / math.pow(1 - eps, j)
    }
    val out = buf.result()
    require(out.length < MaxGuesses, s"guess ladder overflow: dmin=$dmin dmax=$dmax eps=$eps")
    out
  }

  /** Number of guesses without materializing the ladder. */
  def size(dmin: Double, dmax: Double, eps: Double): Int = apply(dmin, dmax, eps).length
}

/** Bounds `[d_min, d_max]` on pairwise distances.
  *
  * The paper treats them as known per dataset; here they are estimated from
  * the data (a substitution documented in DESIGN.md):
  *  - `d_max`: `2 · max_x d(x, x_0)` for an arbitrary pivot `x_0` is an upper
  *    bound by the triangle inequality (and ≥ the true max/2, so the ladder
  *    top is within one doubling of OPT).
  *  - `d_min`: minimum pairwise distance over a deterministic sample. This is
  *    an *upper* bound on the true d_min, but the ladder only needs its floor
  *    to sit at or below OPT_f, which the minimum over ~10^6 sampled pairs
  *    does in practice; a final /2 margin is applied for safety.
  */
final case class DistanceBounds(dmin: Double, dmax: Double) {
  require(dmin > 0 && dmax >= dmin, s"bad bounds: [$dmin, $dmax]")
  def delta: Double = dmax / dmin
}

object DistanceBounds {

  /** Exact bounds by full pairwise scan — test-scale only, O(n²). */
  def exact(xs: IndexedSeq[Element], metric: Metric): DistanceBounds = {
    var mn = Double.PositiveInfinity
    var mx = 0.0
    var i = 0
    while (i < xs.length) {
      var j = i + 1
      while (j < xs.length) {
        val d = metric.dist(xs(i), xs(j))
        if (d > 0 && d < mn) mn = d
        if (d > mx) mx = d
        j += 1
      }
      i += 1
    }
    require(mn.isFinite && mx > 0, "degenerate dataset: all points coincide")
    DistanceBounds(mn, mx)
  }

  /** Estimated bounds: pivot-based d_max upper bound and sampled d_min with a
    * /2 safety margin (see class doc). Deterministic in the input order.
    */
  def estimate(xs: IndexedSeq[Element], metric: Metric, sampleSize: Int = 1500): DistanceBounds = {
    require(xs.length >= 2, "need at least two elements")
    val pivot = xs.head
    var far = 0.0
    var i = 1
    while (i < xs.length) {
      val d = metric.dist(pivot, xs(i))
      if (d > far) far = d
      i += 1
    }
    val dmax = math.max(2 * far, Double.MinPositiveValue)
    // Deterministic stride sample.
    val stride = math.max(1, xs.length / sampleSize)
    val sample = xs.indices.by(stride).map(xs).toIndexedSeq
    var mn = Double.PositiveInfinity
    i = 0
    while (i < sample.length) {
      var j = i + 1
      while (j < sample.length) {
        val d = metric.dist(sample(i), sample(j))
        if (d > 0 && d < mn) mn = d
        j += 1
      }
      i += 1
    }
    if (!mn.isFinite) mn = dmax / 1e6 // all sampled points coincide; fall back to a wide ladder
    DistanceBounds(math.min(mn / 2, dmax), math.max(dmax, mn / 2))
  }
}
