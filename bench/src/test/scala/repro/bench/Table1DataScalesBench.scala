package repro.bench

import repro.SparkSpec
import repro.eval.TableReports

/** Table 1: row counts per data scale. Paper 1× = 25,099 persons / 9,820
  * homes; our base is ~1/5 of that with the same persons-per-home ratio
  * (DESIGN.md substitution 3), swept over our 1×/2×/5×.
  */
class Table1DataScalesBench extends SparkSpec {

  test("Table 1: data scales (paper vs measured)") {
    val rows = TableReports.table1Rows(spark, TableReports.DefaultScales)
    println("[Table 1] paper:    1x = 25,099 persons / 9,820 homes; " +
      "2x = 50,039 / 19,640; 5x = 124,746 / 49,100 (VJoin = persons)")
    println("[Table 1] measured (our scaled-down base):")
    println(TableReports.renderTable1(rows))

    // shape: |VJoin| = |Persons| at every scale; housing scales linearly
    rows.foreach(r => assert(r.vjoin == r.persons))
    val base = rows.head
    rows.foreach { r =>
      assert(r.housing == (base.housing * r.scale).toLong)
      val ratio = r.persons.toDouble / r.housing
      assert(ratio > 1.8 && ratio < 3.2, s"persons-per-home ratio $ratio")
    }
  }
}
