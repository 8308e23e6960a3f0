package repro.core.ccrel

import repro.core.model.{CardinalityConstraint, DbSchema}

/** Pairwise relationship between two CCs (Definitions 4.2–4.4). */
sealed trait CCRelation
object CCRelation {
  /** Def 4.2: R1 conditions disjoint, or R1 identical and R2 disjoint. */
  case object Disjoint extends CCRelation
  /** Def 4.3 applied left-in-right: first CC contained in second. */
  case object FirstInSecond extends CCRelation
  /** Def 4.3 applied right-in-left: second CC contained in first. */
  case object SecondInFirst extends CCRelation
  /** Identical selection conditions (degenerate mutual containment). */
  case object Identical extends CCRelation
  /** Def 4.4: neither disjoint nor contained. */
  case object Intersecting extends CCRelation

  /** Label the relationship between `a` and `b` under `schema`.
    *
    * Containment is checked on the full condition (R1 and R2 attributes
    * together, per Definition 4.3); disjointness follows Definition 4.2's
    * two cases.
    */
  def relate(a: CardinalityConstraint, b: CardinalityConstraint,
             schema: DbSchema): CCRelation = {
    val a1 = a.r1Cond(schema); val b1 = b.r1Cond(schema)
    val a2 = a.r2Cond(schema); val b2 = b.r2Cond(schema)
    val disjoint =
      a1.disjointWith(b1) || (a1.identicalTo(b1) && a2.disjointWith(b2))
    if (disjoint) Disjoint
    else {
      val ab = a.cond.containedIn(b.cond)
      val ba = b.cond.containedIn(a.cond)
      if (ab && ba) Identical
      else if (ab) FirstInSecond
      else if (ba) SecondInFirst
      else Intersecting
    }
  }
}
