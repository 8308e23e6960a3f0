package repro.core.model

/** Linear cardinality constraint (Definition 2.4):
  * `|σ_cond(R1 ⋈_{FK=K2} R2)| = target`.
  *
  * The condition is conjunctive over non-key attributes of both relations.
  *
  * @param id     stable identifier (used in reports and Hasse diagrams)
  * @param cond   conjunctive selection condition over R1 ∪ R2 attributes
  * @param target required count in the join view
  */
final case class CardinalityConstraint(id: String, cond: SelCond, target: Long)
    extends Serializable {
  require(target >= 0, s"negative target in CC $id")

  /** Condition restricted to the R1 attributes. */
  def r1Cond(schema: DbSchema): SelCond = cond.onAttrs(schema.r1.attrs.toSet)

  /** Condition restricted to the R2 attributes. */
  def r2Cond(schema: DbSchema): SelCond = cond.onAttrs(schema.r2.attrs.toSet)
}
