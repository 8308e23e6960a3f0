package repro.bench

import repro.SparkSpec
import repro.eval.TableReports

/** Figure 8a: CC/DC error of Baseline, Baseline+marginals and Hybrid as the
  * data grows, with `S_DC_all` and the non-intersecting `S_CC_good`.
  *
  * Paper (scales 1×–40×): baseline CC 0.300–0.559 / DC 0.218–0.371;
  * baseline+marginals CC 0 / DC 0.445–0.520; hybrid CC 0 / DC 0.
  */
class Figure8aAccuracyBench extends SparkSpec {

  test("Figure 8a: accuracy sweep, S_DC_all + S_CC_good") {
    val rows = TableReports.figure8Rows(spark, "good")
    println("[Fig 8a] paper: baseline CC .300-.559 DC .218-.371 | " +
      "baseline+marg CC 0 DC .445-.520 | hybrid CC 0 DC 0")
    println(TableReports.renderAccuracy("Figure 8a measured (S_DC_all, S_CC_good)", rows))

    val hybrid = rows.filter(_.algo == "hybrid")
    val baseline = rows.filter(_.algo == "baseline")
    val baselineM = rows.filter(_.algo == "baselineM")

    // the paper's qualitative findings, which must reproduce:
    hybrid.foreach { r =>
      assert(r.ccMedian == 0.0 && r.ccMean == 0.0, s"hybrid CC error at ${r.label}: $r")
      assert(r.dcErr == 0.0, s"hybrid DC error at ${r.label}: $r")
    }
    baselineM.foreach { r =>
      assert(r.ccMedian == 0.0, s"baseline+marginals should satisfy good CCs: $r")
      assert(r.dcErr > 0.0, s"baseline+marginals should violate DCs: $r")
    }
    baseline.foreach { r =>
      // our baseline ILP keeps per-bin availability rows (EXPERIMENTS.md), so
      // its error is overshoot from random completion — assert on the mean,
      // which is robustly positive, rather than the median
      assert(r.ccMean > 0.0, s"plain baseline should incur CC error: $r")
      assert(r.dcErr > 0.0, s"plain baseline should violate DCs: $r")
    }
  }
}
