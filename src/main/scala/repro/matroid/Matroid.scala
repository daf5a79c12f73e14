package repro.matroid

import repro.core.Element

/** A matroid `M = (V, I)` over stream elements, exposed through the two
  * predicates the intersection algorithm needs. Implementations must satisfy
  * the matroid axioms (property-tested in `MatroidSpec`):
  * hereditary, and the augmentation property.
  */
trait Matroid extends Serializable {
  /** Ground set. */
  def ground: IndexedSeq[Element]

  /** Is `S ∪ {x}` independent, given independent `S` (x ∉ S)? */
  def canAdd(s: collection.Set[Long], x: Element): Boolean

  /** Is `S ∪ {x} \ {y}` independent, given independent `S`, x ∉ S, y ∈ S,
    * and `S ∪ {x}` dependent? For partition matroids this is a swap within
    * the saturated part.
    */
  def canSwap(s: collection.Set[Long], x: Element, y: Element): Boolean

  /** Is the whole set independent (used by tests / brute-force checks)? */
  def isIndependent(s: Seq[Element]): Boolean
}

/** A partition matroid: the ground set is split into parts and a set is
  * independent iff it holds at most `cap(part)` elements of each part.
  *
  * Both matroids of SFDM2 are instances: M₁ partitions by group with caps
  * k_i; M₂ partitions by cluster with caps 1.
  *
  * @param ground ground set
  * @param part   part index of each element (by element id)
  * @param cap    capacity of each part index
  */
final class PartitionMatroid(
    val ground: IndexedSeq[Element],
    part: Long => Int,
    cap: Int => Int,
) extends Matroid {

  private def countInPart(s: collection.Set[Long], p: Int): Int = {
    var c = 0
    val it = s.iterator
    while (it.hasNext) if (part(it.next()) == p) c += 1
    c
  }

  override def canAdd(s: collection.Set[Long], x: Element): Boolean = {
    val p = part(x.id)
    countInPart(s, p) < cap(p)
  }

  override def canSwap(s: collection.Set[Long], x: Element, y: Element): Boolean = {
    // S+x violates only part(x)'s cap; removing y fixes it iff y shares the part.
    part(y.id) == part(x.id)
  }

  override def isIndependent(s: Seq[Element]): Boolean =
    s.groupBy(e => part(e.id)).forall { case (p, es) => es.size <= cap(p) }

  /** Part index of an element id (exposed for the augmentation graph). */
  def partOf(id: Long): Int = part(id)
}
