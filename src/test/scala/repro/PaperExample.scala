package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.model._
import repro.core.model.CmpOp._

/** The paper's running example (Figures 1 and 2): 9 Persons, 6 Housing
  * units, the 5 DCs of Figure 2a and the 4 CCs of Figure 2b. A consistent
  * completion exists (Figure 3), so an exact algorithm must reach zero CC
  * and DC error on it.
  */
object PaperExample {
  val schema: DbSchema = DbSchema(
    R1Schema("pid", Seq("Rel", "MultiLing"), Seq("Age"), "hid"),
    R2Schema("hid", Seq("Area")))

  def r1(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(
      (1L, 75, "Owner", "0"), (2L, 75, "Owner", "1"), (3L, 25, "Owner", "0"),
      (4L, 25, "Owner", "1"), (5L, 24, "Spouse", "0"), (6L, 10, "Child", "1"),
      (7L, 10, "Child", "1"), (8L, 30, "Owner", "0"), (9L, 30, "Owner", "1"),
    ).toDF("pid", "Age", "Rel", "MultiLing")
      .withColumn("hid", lit(null).cast("long"))
  }

  def r2(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq((1L, "Chicago"), (2L, "Chicago"), (3L, "Chicago"), (4L, "Chicago"),
        (5L, "NYC"), (6L, "NYC")).toDF("hid", "Area")
  }

  private val owner = SelCond(Seq(CatEq("Rel", "Owner")))
  private val ownerMl = SelCond(Seq(CatEq("Rel", "Owner"), CatEq("MultiLing", "1")))
  private val spouse = SelCond(Seq(CatEq("Rel", "Spouse")))
  private val child = SelCond(Seq(CatEq("Rel", "Child")))

  /** Figure 2a, conjunctively expanded. */
  val dcs: Seq[DenialConstraint] = Seq(
    DenialConstraint("DC_OO", Seq(owner, owner), Nil),
    DenialConstraint("DC_OS_low", Seq(owner, spouse),
                     Seq(CrossCond(1, "Age", Lt, 0, "Age", -50))),
    DenialConstraint("DC_OS_up", Seq(owner, spouse),
                     Seq(CrossCond(1, "Age", Gt, 0, "Age", 50))),
    DenialConstraint("DC_OC_low", Seq(ownerMl, child),
                     Seq(CrossCond(1, "Age", Lt, 0, "Age", -50))),
    DenialConstraint("DC_OC_up", Seq(ownerMl, child),
                     Seq(CrossCond(1, "Age", Gt, 0, "Age", -12))))

  /** Figure 2b. */
  val ccs: Seq[CardinalityConstraint] = Seq(
    CardinalityConstraint("CC1", SelCond(Seq(CatEq("Rel", "Owner"), CatEq("Area", "Chicago"))), 4),
    CardinalityConstraint("CC2", SelCond(Seq(CatEq("Rel", "Owner"), CatEq("Area", "NYC"))), 2),
    CardinalityConstraint("CC3", SelCond(Seq(NumRange("Age", 0, 24), CatEq("Area", "Chicago"))), 3),
    CardinalityConstraint("CC4", SelCond(Seq(CatEq("MultiLing", "1"), CatEq("Area", "Chicago"))), 4))
}
