package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.model._
import repro.core.phase1.{HybridCompleter, Phase1Result}
import repro.eval.ErrorMeasures
import repro.{PaperExample, SparkSpec}

class HybridCompleterSpec extends SparkSpec {
  import PaperExample.schema

  /** V_Join with the R2 attribute values joined back for CC counting. */
  private def withArea(p1: Phase1Result): DataFrame =
    p1.vjoin.join(p1.comboSpace.asDataFrame(spark), Seq("__combo"), "left")

  test("paper example: all four (intersecting) CCs satisfied via ILP path") {
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, PaperExample.ccs, HybridCompleter.Mode.Hybrid)
    assert(p1.stats.nS2 == 4 && p1.stats.nS1 == 0) // CC3/CC4 intersect the rest
    val errs = ErrorMeasures.ccRelErrors(withArea(p1), PaperExample.ccs)
    assert(errs.forall(_ == 0.0), s"errors: $errs")
  }

  test("non-intersecting subset goes through the Hasse path (no ILP)") {
    val ccs = PaperExample.ccs.take(2) // owners Chicago / owners NYC — disjoint
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, ccs, HybridCompleter.Mode.Hybrid)
    assert(p1.stats.nS1 == 2 && p1.stats.nS2 == 0)
    assert(p1.stats.ilpMs == 0)
    val errs = ErrorMeasures.ccRelErrors(withArea(p1), ccs)
    assert(errs.forall(_ == 0.0))
  }

  test("V_Join row count equals |R1| (foreign-key dependence)") {
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, PaperExample.ccs, HybridCompleter.Mode.Hybrid)
    assert(p1.vjoin.count() == 9)
  }

  test("hybrid leftover tuples take safe combos, never inflating a CC") {
    // One CC that uses only 2 owners; everything else is leftover.
    val ccs = Seq(CardinalityConstraint("two_owners",
      SelCond(Seq(CatEq("Rel", "Owner"), CatEq("Area", "NYC"))), 2))
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, ccs, HybridCompleter.Mode.Hybrid)
    val errs = ErrorMeasures.ccRelErrors(withArea(p1), ccs)
    assert(errs.forall(_ == 0.0))
    // leftovers must have been pushed to the Chicago combo (not in the CC? it is
    // not: the CC touches only NYC) or stayed valid — either way no invalids
    assert(p1.vjoin.filter(p1.vjoin("__combo") === -1).count() == 0)
  }

  test("invalid tuples appear when every combo would disturb a CC") {
    // CCs covering both areas for spouses: a spouse leftover cannot hide.
    val ccs = Seq(
      CardinalityConstraint("s1", SelCond(Seq(CatEq("Rel", "Spouse"), CatEq("Area", "Chicago"))), 0),
      CardinalityConstraint("s2", SelCond(Seq(CatEq("Rel", "Spouse"), CatEq("Area", "NYC"))), 0))
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, ccs, HybridCompleter.Mode.Hybrid)
    // the single spouse tuple must be invalid: any combo adds to some CC
    assert(p1.stats.nInvalidBins == 1)
    assert(p1.vjoin.filter(p1.vjoin("__combo") === -1).count() == 1)
  }

  test("baseline mode completes every tuple randomly (no invalids)") {
    val ccs = PaperExample.ccs.take(1)
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, ccs, HybridCompleter.Mode.IlpOnly)
    assert(p1.vjoin.filter(p1.vjoin("__combo") === -1).count() == 0)
  }

  test("baseline-with-marginals satisfies consistent CCs") {
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, PaperExample.ccs, HybridCompleter.Mode.IlpOnlyMarginals)
    val errs = ErrorMeasures.ccRelErrors(withArea(p1), PaperExample.ccs)
    assert(errs.forall(_ == 0.0), s"errors: $errs")
  }

  test("stats capture the phase split sizes") {
    val p1 = HybridCompleter.run(PaperExample.r1(spark), PaperExample.r2(spark),
      schema, PaperExample.ccs, HybridCompleter.Mode.Hybrid)
    assert(p1.stats.nS1 + p1.stats.nS2 == PaperExample.ccs.size)
    assert(p1.stats.ilpVars > 0)
  }
}
