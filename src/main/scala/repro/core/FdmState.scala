package repro.core

/** Result of a (fair) diversity-maximization run.
  *
  * @param solution       the selected subset (for fair algorithms,
  *                       `|solution ∩ X_i| = k_i` for every group)
  * @param diversity      `div(solution)`
  * @param storedElements number of distinct elements the algorithm held in
  *                       memory (the paper's "#elem" column in Table II)
  * @param streamNanos    wall time of the one-pass stream-processing phase
  * @param postNanos      wall time of the post-processing phase
  */
final case class FdmResult(
    solution: Vector[Element],
    diversity: Double,
    storedElements: Int,
    streamNanos: Long,
    postNanos: Long,
) {
  def totalNanos: Long = streamNanos + postNanos
  def totalSeconds: Double = totalNanos / 1e9

  /** Group histogram of the solution — fairness checks read this. */
  def groupCounts: Map[Int, Int] = solution.groupBy(_.group).view.mapValues(_.size).toMap
}

/** Mutable one-pass streaming state shared by Algorithm 1, SFDM1, and SFDM2:
  * feed elements with [[process]], then call [[finish]] exactly once.
  *
  * Implementations keep only the per-guess candidates (memory independent of
  * the stream length), so a single instance can be driven equally well by a
  * local iterator, a Structured Streaming `foreachBatch` sink, or a merged
  * per-partition coreset.
  */
trait FdmState extends Serializable {
  def process(x: Element): Unit

  /** Convenience bulk feed (still strictly one pass, in iterator order). */
  final def processAll(xs: IterableOnce[Element]): Unit = {
    val it = xs.iterator
    while (it.hasNext) process(it.next())
  }

  /** Run post-processing and return the final solution. */
  def finish(): FdmResult

  /** Distinct elements currently stored across all candidates — also the
    * coreset a partition-local state ships to the driver in the distributed
    * execution mode.
    */
  def contents: IndexedSeq[Element]

  /** Distinct elements currently stored across all candidates. */
  def storedElementCount: Int = contents.size
}
