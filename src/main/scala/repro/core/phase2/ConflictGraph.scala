package repro.core.phase2

import repro.core.model.DenialConstraint
import scala.collection.mutable

/** Conflict hypergraph construction (Definition 5.1).
  *
  * Vertices are tuple indices; a hyperedge is a set of tuples that would
  * jointly violate some DC if they shared a foreign key. Enumeration is
  * slot-filtered: for each DC only tuples satisfying a slot's single-tuple
  * condition are candidates for that slot, which keeps the pair/k-tuple
  * scans small in practice.
  */
object ConflictGraph {

  /** Enumerate hyperedges among `tuples` (attribute → value maps). Returned
    * edges are sorted, deduplicated vertex-index vectors.
    */
  def edges(tuples: IndexedSeq[Map[String, Any]],
            dcs: Seq[DenialConstraint]): Vector[Vector[Int]] = {
    val out = mutable.LinkedHashSet.empty[Vector[Int]]
    for (dc <- dcs) {
      val slotCands: IndexedSeq[IndexedSeq[Int]] = dc.slots.map { s =>
        tuples.indices.filter(i => s.matches(tuples(i)))
      }.toIndexedSeq
      // Assign distinct tuple indices to slots (order matters for cross conds).
      def rec(slot: Int, chosen: List[Int]): Unit = {
        if (slot == dc.arity) {
          val assignment = chosen.reverse.toIndexedSeq
          if (dc.bodyHolds(assignment.map(tuples))) {
            out += assignment.sorted.toVector
          }
        } else {
          slotCands(slot).foreach { i =>
            if (!chosen.contains(i)) rec(slot + 1, i :: chosen)
          }
        }
      }
      rec(0, Nil)
    }
    out.toVector
  }
}
