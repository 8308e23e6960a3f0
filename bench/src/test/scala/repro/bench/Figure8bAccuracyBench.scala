package repro.bench

import repro.SparkSpec
import repro.eval.TableReports

/** Figure 8b: same sweep as 8a but with the intersecting `S_CC_bad` —
  * the hybrid must route part of the set through the ILP.
  *
  * Paper (scales 1×–40×): baseline CC 0.233–0.580 / DC 0.228–0.373;
  * baseline+marginals CC 0 / DC 0.402–0.510; hybrid CC median 0
  * (mean 0.048–0.093) / DC 0.
  */
class Figure8bAccuracyBench extends SparkSpec {

  test("Figure 8b: accuracy sweep, S_DC_all + S_CC_bad") {
    val rows = TableReports.figure8Rows(spark, "bad")
    println("[Fig 8b] paper: baseline CC .233-.580 DC .228-.373 | " +
      "baseline+marg CC 0 DC .402-.510 | hybrid CCmed 0 (mean .048-.093) DC 0")
    println(TableReports.renderAccuracy("Figure 8b measured (S_DC_all, S_CC_bad)", rows))

    val hybrid = rows.filter(_.algo == "hybrid")
    val baseline = rows.filter(_.algo == "baseline")

    hybrid.foreach { r =>
      assert(r.dcErr == 0.0, s"hybrid DC error at ${r.label}: $r")
      assert(r.ccMedian <= 0.05, s"hybrid CC median too high at ${r.label}: $r")
      assert(r.ccMean <= 0.15, s"hybrid CC mean too high at ${r.label}: $r")
    }
    baseline.foreach { r =>
      assert(r.dcErr > 0.0, s"plain baseline should violate DCs: $r")
    }
    // hybrid beats the plain baseline on CC error at every scale
    hybrid.zip(baseline).foreach { case (h, b) =>
      assert(h.ccMean <= b.ccMean, s"hybrid ${h.ccMean} vs baseline ${b.ccMean} at ${h.label}")
    }
  }
}
