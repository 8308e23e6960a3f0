package repro.census

import repro.core.model.{DbSchema, R1Schema, R2Schema}

/** Schema constants for the Census-derived substitute dataset:
  * `Persons(pid, Rel, MultiLing, Age, hid)` and `Housing(hid, Tenure, Area)`
  * — the same shape as the paper's 2010 Decennial Census extract.
  */
object CensusSchema {
  val Owner = "Owner"
  val Spouse = "Spouse"
  val UnmarriedPartner = "UnmarriedPartner"
  val BiologicalChild = "BiologicalChild"
  val AdoptedChild = "AdoptedChild"
  val StepChild = "StepChild"
  val FosterChild = "FosterChild"
  val Sibling = "Sibling"
  val Parent = "Parent"
  val ParentInLaw = "ParentInLaw"
  val Grandchild = "Grandchild"
  val ChildInLaw = "ChildInLaw"
  val Housemate = "Housemate"

  /** The 13 relationship-to-householder categories. */
  val Rels: IndexedSeq[String] = IndexedSeq(
    Owner, Spouse, UnmarriedPartner, BiologicalChild, AdoptedChild, StepChild,
    FosterChild, Sibling, Parent, ParentInLaw, Grandchild, ChildInLaw, Housemate)

  /** Child categories covered by DCs 1–2 of Table 4. */
  val ChildRels: Seq[String] = Seq(BiologicalChild, AdoptedChild, StepChild)

  /** All tenure values; CCs only ever use the first three, so `NoPay`
    * combos form `combo_unused` for Algorithm 2.
    */
  val Tenures: IndexedSeq[String] = IndexedSeq("Owned", "Mortgaged", "Rented", "NoPay")
  val TenuresInCCs: IndexedSeq[String] = Tenures.take(3)

  def areaName(i: Int): String = f"A$i%02d"

  val MaxAge = 114

  val schema: DbSchema = DbSchema(
    R1Schema(key = "pid", catAttrs = Seq("Rel", "MultiLing"),
             numAttrs = Seq("Age"), fk = "hid"),
    R2Schema(key = "hid", attrs = Seq("Tenure", "Area")))
}
