package repro.core

/** A stream element: a point in a metric space tagged with its demographic group.
  *
  * @param id       unique identifier (stable across permutations of the stream;
  *                 used for deduplication and deterministic tie-breaking)
  * @param group    0-based group index in `[0, m)` assigned by the sensitive
  *                 attribute (the paper's `c(x)`)
  * @param features coordinate vector; its interpretation depends on the
  *                 [[Metric]] in use (Euclidean / Manhattan / Angular)
  */
final case class Element(id: Long, group: Int, features: Array[Double]) {
  /** Identity by id only: feature arrays use reference equality by default,
    * and a stream never contains two distinct elements with the same id.
    */
  override def equals(other: Any): Boolean = other match {
    case e: Element => e.id == id
    case _          => false
  }
  override def hashCode(): Int = java.lang.Long.hashCode(id)

  override def toString: String =
    s"Element($id, g$group, [${features.take(4).map(v => f"$v%.3f").mkString(",")}${if (features.length > 4) ",…" else ""}])"
}
