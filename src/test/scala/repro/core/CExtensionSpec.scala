package repro.core

import org.apache.spark.sql.functions._
import repro.census.{CensusData, CensusSchema, ConstraintGen}
import repro.core.CExtension
import repro.eval.ErrorMeasures
import repro.{PaperExample, SparkSpec}

class CExtensionSpec extends SparkSpec {

  test("paper running example end-to-end: zero CC and DC error") {
    val res = CExtension.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, PaperExample.dcs)
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val errs = ErrorMeasures.ccRelErrors(joined, PaperExample.ccs)
    assert(errs.forall(_ == 0.0), s"CC errors: $errs")
    assert(ErrorMeasures.dcViolationFraction(res.r1Hat, PaperExample.schema,
      PaperExample.dcs) == 0.0)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("census mini end-to-end with good CCs: exact CCs, zero DC error") {
    val schema = CensusSchema.schema
    val (persons, housing) = CensusData.generate(spark, scale = 0.05, nAreas = 4)
    val gtJoin = persons.join(housing, Seq("hid"))
    val ccs = ConstraintGen.sccGood(gtJoin, nAreas = 4)
    val dcs = ConstraintGen.sdcAll
    val res = CExtension.run(CensusData.blind(persons), housing, schema, ccs, dcs)
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val errs = ErrorMeasures.ccRelErrors(joined, ccs)
    assert(ErrorMeasures.median(errs) == 0.0)
    assert(errs.forall(_ == 0.0), s"nonzero CC errors: ${ccs.map(_.id).zip(errs).filter(_._2 > 0).take(5)}")
    assert(ErrorMeasures.dcViolationFraction(res.r1Hat, schema, dcs) == 0.0)
    assert(res.r1Hat.count() == persons.count())
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("census mini with bad CCs: DCs exact, CC error small") {
    val schema = CensusSchema.schema
    val (persons, housing) = CensusData.generate(spark, scale = 0.05, nAreas = 4)
    val gtJoin = persons.join(housing, Seq("hid"))
    val ccs = ConstraintGen.sccBad(gtJoin, nAreas = 4)
    val dcs = ConstraintGen.sdcAll
    val res = CExtension.run(CensusData.blind(persons), housing, schema, ccs, dcs)
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val errs = ErrorMeasures.ccRelErrors(joined, ccs)
    assert(ErrorMeasures.median(errs) <= 0.05, s"median ${ErrorMeasures.median(errs)}")
    assert(ErrorMeasures.dcViolationFraction(res.r1Hat, schema, dcs) == 0.0)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("timings are recorded for both phases") {
    val res = CExtension.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, PaperExample.dcs)
    assert(res.timings.totalMs >= res.timings.phase1Ms)
    assert(res.timings.totalMs >= res.timings.coloringMs)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("no CCs at all: DCs still satisfied, everything completed") {
    val res = CExtension.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, Nil, PaperExample.dcs)
    assert(res.r1Hat.filter(col("hid").isNull).count() == 0)
    assert(ErrorMeasures.dcViolationFraction(res.r1Hat, PaperExample.schema,
      PaperExample.dcs) == 0.0)
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }

  test("no DCs: FK assignment still consistent with V_Join") {
    val res = CExtension.run(PaperExample.r1(spark), PaperExample.r2(spark),
      PaperExample.schema, PaperExample.ccs, Nil)
    val joined = res.r1Hat.join(res.r2Hat, Seq("hid"))
    val errs = ErrorMeasures.ccRelErrors(joined, PaperExample.ccs)
    assert(errs.forall(_ == 0.0))
    res.vjoin.unpersist(); res.r1Hat.unpersist()
  }
}
