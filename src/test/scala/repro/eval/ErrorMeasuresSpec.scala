package repro.eval

import org.apache.spark.sql.functions._
import repro.core.model._
import repro.{Oracle, PaperExample, SparkSpec}

class ErrorMeasuresSpec extends SparkSpec {

  /** SQL rendering of a conjunctive condition for the DuckDB oracle (which
    * stores all columns as VARCHAR, so numeric attrs need casts).
    */
  private def sqlOf(cond: SelCond): String =
    if (cond.isEmpty) "TRUE"
    else cond.preds.map {
      case CatEq(a, v)        => s"$a = '$v'"
      case NumRange(a, lo, hi) => s"CAST($a AS INT) BETWEEN $lo AND $hi"
    }.mkString(" AND ")

  private def gtJoin = {
    import spark.implicits._
    // small hand-built join view: (Rel, MultiLing, Age, Area)
    Seq(("Owner", "0", 40, "Chicago"), ("Owner", "1", 30, "Chicago"),
        ("Owner", "0", 25, "NYC"), ("Spouse", "1", 20, "Chicago"),
        ("Child", "0", 5, "NYC"))
      .toDF("Rel", "MultiLing", "Age", "Area")
  }

  test("ccCounts matches direct filtering") {
    val ccs = Seq(
      CardinalityConstraint("a", SelCond(Seq(CatEq("Rel", "Owner"))), 0),
      CardinalityConstraint("b", SelCond(Seq(CatEq("Area", "Chicago"))), 0),
      CardinalityConstraint("c", SelCond(Seq(NumRange("Age", 0, 24))), 0))
    assert(ErrorMeasures.ccCounts(gtJoin, ccs) == Seq(3L, 3L, 2L))
  }

  test("ccCounts agrees with DuckDB for every paper CC") {
    val df = gtJoin
    for (cc <- PaperExample.ccs) {
      val sparkCnt = df.filter(cc.cond.toColumn).agg(count(lit(1)).alias("cnt"))
      Oracle.assertEquivalent(sparkCnt,
        s"SELECT COUNT(*) AS cnt FROM j WHERE ${sqlOf(cc.cond)}", "j" -> df)
    }
  }

  test("ccCounts chunking handles more than 60 CCs") {
    val ccs = (0 until 150).map(i =>
      CardinalityConstraint(s"cc$i", SelCond(Seq(NumRange("Age", i % 50, i % 50 + 10))), 0))
    val counts = ErrorMeasures.ccCounts(gtJoin, ccs)
    assert(counts.size == 150)
    // spot-check one directly
    assert(counts(0) == gtJoin.filter(col("Age") <= 10).count())
  }

  test("relative CC error uses max(10, target) as denominator") {
    val ccs = Seq(
      CardinalityConstraint("small", SelCond(Seq(CatEq("Rel", "Owner"))), 5), // got 3
      CardinalityConstraint("big", SelCond(Seq(CatEq("Area", "Chicago"))), 100)) // got 3
    val errs = ErrorMeasures.ccRelErrors(gtJoin, ccs)
    assert(math.abs(errs(0) - 2.0 / 10) < 1e-9)
    assert(math.abs(errs(1) - 97.0 / 100) < 1e-9)
  }

  test("median and mean helpers") {
    assert(ErrorMeasures.median(Seq(3.0, 1.0, 2.0)) == 2.0)
    assert(ErrorMeasures.median(Seq(4.0, 1.0, 2.0, 3.0)) == 2.5)
    assert(ErrorMeasures.median(Nil) == 0.0)
    assert(ErrorMeasures.mean(Seq(1.0, 2.0, 3.0)) == 2.0)
    assert(ErrorMeasures.mean(Nil) == 0.0)
  }

  test("DC error counts violating tuples, not pairs (paper example: 2/9)") {
    import spark.implicits._
    // paper §6.1: if the first two Persons tuples shared hid 2, error = 2/9
    val r1 = Seq(
      (1L, 75, "Owner", "0", 2L), (2L, 75, "Owner", "1", 2L), (3L, 25, "Owner", "0", 3L),
      (4L, 25, "Owner", "1", 4L), (5L, 24, "Spouse", "0", 1L), (6L, 10, "Child", "1", 5L),
      (7L, 10, "Child", "1", 5L), (8L, 30, "Owner", "0", 6L), (9L, 30, "Owner", "1", 7L),
    ).toDF("pid", "Age", "Rel", "MultiLing", "hid")
    val err = ErrorMeasures.dcViolationFraction(r1, PaperExample.schema, PaperExample.dcs)
    assert(math.abs(err - 2.0 / 9) < 1e-9)
  }

  test("DC error is zero for an all-distinct FK assignment") {
    import spark.implicits._
    val r1 = (1L to 9L).map(i => (i, 30, "Owner", "0", i)).toSeq
      .toDF("pid", "Age", "Rel", "MultiLing", "hid")
    assert(ErrorMeasures.dcViolationFraction(r1, PaperExample.schema, PaperExample.dcs) == 0.0)
  }

  test("DC error with empty DC set is zero") {
    import spark.implicits._
    val r1 = Seq((1L, 30, "Owner", "0", 1L)).toDF("pid", "Age", "Rel", "MultiLing", "hid")
    assert(ErrorMeasures.dcViolationFraction(r1, PaperExample.schema, Nil) == 0.0)
  }
}
