package repro.baseline

import org.apache.spark.sql.functions._
import repro.census.{CensusData, CensusSchema, ConstraintGen}
import repro.eval.ErrorMeasures
import repro.{PaperExample, SparkSpec}

class BaselineSpec extends SparkSpec {

  test("baseline completes every FK cell with an existing housing key") {
    val res = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = false)
    assert(res.r1Hat.count() == 9)
    assert(res.r1Hat.filter(col("hid").isNull).count() == 0)
    val dangling = res.r1Hat.join(PaperExample.r2(spark).select("hid"), Seq("hid"), "left_anti")
    assert(dangling.count() == 0)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("baseline never extends R2") {
    val res = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = false)
    assert(res.r2Hat.count() == 6)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("baseline with marginals satisfies consistent CCs on the final database") {
    val res = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = true)
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val errs = ErrorMeasures.ccRelErrors(joined, PaperExample.ccs)
    assert(errs.forall(_ == 0.0), s"errors: $errs")
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("baseline ignores DCs: census run shows DC violations where hybrid has none") {
    val schema = CensusSchema.schema
    val (persons, housing) = CensusData.generate(spark, 0.05, nAreas = 4)
    val gtJoin = persons.join(housing, Seq("hid"))
    val ccs = ConstraintGen.sccGood(gtJoin, nAreas = 4)
    val dcs = ConstraintGen.sdcAll
    val res = BaselineArasu.run(CensusData.blind(persons), housing, schema, ccs,
                                withMarginals = true)
    val dcErr = ErrorMeasures.dcViolationFraction(res.r1Hat, schema, dcs)
    assert(dcErr > 0.0, "random FK assignment should violate some DC at this scale")
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("baseline assignment is deterministic (seeded by key)") {
    val a = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = false)
    val b = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = false)
    val ra = a.r1Hat.select("pid", "hid").collect().map(r => (r.getLong(0), r.getLong(1))).sortBy(_._1).toSeq
    val rb = b.r1Hat.select("pid", "hid").collect().map(r => (r.getLong(0), r.getLong(1))).sortBy(_._1).toSeq
    assert(ra == rb)
    a.vjoin.unpersist(); a.r1Hat.unpersist(); b.vjoin.unpersist(); b.r1Hat.unpersist()
  }

  test("baseline respects the combo a tuple was assigned in Phase I") {
    val res = BaselineArasu.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, withMarginals = true)
    // CC structure forces owners 4/2 across areas; with marginals the CCs hold,
    // which is only possible if FKs match the Phase-I combo assignment.
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val chiOwners = joined.filter(col("Rel") === "Owner" && col("Area") === "Chicago").count()
    assert(chiOwners == 4)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }
}
