package repro.core

/** A distance metric on feature vectors: nonnegative, symmetric, and
  * satisfying the triangle inequality (all three are property-tested).
  *
  * The paper's experiments use Euclidean (Adult, Synthetic), Manhattan
  * (CelebA, Census), and Angular (Lyrics); every algorithm here is generic
  * over this trait, as in the paper.
  */
sealed trait Metric extends Serializable {
  /** Distance between two feature vectors of equal length. */
  def dist(a: Array[Double], b: Array[Double]): Double

  /** Distance between two elements. */
  @inline final def dist(a: Element, b: Element): Double = dist(a.features, b.features)

  /** Short display name for tables and logs. */
  def name: String
}

/** L2 distance. */
case object Euclidean extends Metric {
  override def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }
  override val name = "Euclidean"
}

/** L1 distance. */
case object Manhattan extends Metric {
  override def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += math.abs(a(i) - b(i)); i += 1 }
    s
  }
  override val name = "Manhattan"
}

/** Angular distance: `arccos(cos-similarity)`, the geodesic distance on the
  * unit sphere — a true metric (unlike cosine *dissimilarity*). The zero
  * vector is treated as orthogonal to everything (distance π/2), which keeps
  * the function total; generators never emit zero vectors.
  */
case object Angular extends Metric {
  override def dist(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0.0 || nb == 0.0) math.Pi / 2
    else {
      val c = dot / math.sqrt(na * nb)
      math.acos(math.max(-1.0, math.min(1.0, c)))
    }
  }
  override val name = "Angular"
}

object Metric {
  /** Lookup by the names used in dataset configs and job arguments. */
  def byName(s: String): Metric = s.toLowerCase match {
    case "euclidean" => Euclidean
    case "manhattan" => Manhattan
    case "angular"   => Angular
    case other       => throw new IllegalArgumentException(s"unknown metric: $other")
  }
}
