package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.TableReports._

/** Pure rendering tests for the table builders (no Spark). */
class TableReportsSpec extends AnyFunSuite {

  test("renderTable1 formats one line per scale plus header") {
    val s = renderTable1(Seq(Table1Row(1.0, 5000, 1950, 5000), Table1Row(2.0, 10000, 3900, 10000)))
    val lines = s.split("\n")
    assert(lines.length == 3)
    assert(lines.head.contains("Persons") && lines.head.contains("Housing"))
    assert(lines(1).contains("5000") && lines(2).contains("3900"))
  }

  test("renderAccuracy includes title, header and all rows") {
    val rows = Seq(
      AccuracyRow("1x", "hybrid", 0.0, 0.0, 0.0, 1200, 800),
      AccuracyRow("1x", "baseline", 0.31, 0.4, 0.22, 900, 10))
    val s = renderAccuracy("T", rows)
    assert(s.startsWith("== T"))
    assert(s.contains("hybrid") && s.contains("baseline"))
    assert(s.contains("0.310") && s.contains("0.220"))
  }

  test("renderBreakdown shows stage columns") {
    val s = renderBreakdown(Seq(
      BreakdownRow("good", 264, 10, 200, 0, 3000, 0.0, 0.0, 0.0, 264, 0, 0),
      BreakdownRow("bad", 264, 12, 150, 90000, 4000, 0.01, 0.05, 0.0, 130, 134, 2000)))
    assert(s.contains("Pairwise") && s.contains("Recursion") && s.contains("ILP"))
    assert(s.contains("1.5m")) // 90000ms ILP
  }

  test("fmtMs picks sensible units") {
    assert(Harness.fmtMs(250) == "250ms")
    assert(Harness.fmtMs(2500) == "2.5s")
    assert(Harness.fmtMs(150000) == "2.5m")
  }

  test("fmtErr renders three decimals") {
    assert(Harness.fmtErr(0.0) == "0.000")
    assert(Harness.fmtErr(0.12345) == "0.123")
  }

  test("default scales are the documented 1x/2x/5x") {
    assert(DefaultScales == Seq(1.0, 2.0, 5.0))
  }

  test("unknown algo and constraint-set names are rejected by the harness") {
    assertThrows[IllegalArgumentException](Harness.dcSet("nope"))
  }
}
