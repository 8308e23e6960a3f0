package repro.census

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.phase2.ConflictGraph
import repro.eval.ErrorMeasures

class CensusDataSpec extends SparkSpec {

  test("household generation is deterministic in (seed, hid)") {
    assert(CensusData.members(42L, 7L) == CensusData.members(42L, 7L))
    assert(CensusData.members(42L, 7L) != CensusData.members(43L, 7L) ||
           CensusData.members(42L, 8L) != CensusData.members(42L, 7L))
  }

  test("every household has exactly one owner first") {
    (1L to 300L).foreach { hid =>
      val m = CensusData.members(hid, 7L)
      assert(m.count(_.Rel == CensusSchema.Owner) == 1)
      assert(m.head.Rel == CensusSchema.Owner)
    }
  }

  test("households satisfy every DC of Table 4 (pure check over 500 homes)") {
    (1L to 500L).foreach { hid =>
      val m = CensusData.members(hid, 7L)
      val tuples = m.toIndexedSeq.map(p =>
        Map[String, Any]("Rel" -> p.Rel, "MultiLing" -> p.MultiLing, "Age" -> p.Age))
      val edges = ConflictGraph.edges(tuples, ConstraintGen.sdcAll)
      assert(edges.isEmpty,
        s"household $hid violates: $edges members=${m.map(p => (p.Rel, p.Age, p.MultiLing))}")
    }
  }

  test("ages stay within the census domain [0, 114]") {
    (1L to 300L).foreach { hid =>
      CensusData.members(hid, 7L).foreach(p => assert(p.Age >= 0 && p.Age <= 114))
    }
  }

  test("pids are unique and tied to the household") {
    val all = (1L to 100L).flatMap(CensusData.members(_, 7L))
    assert(all.map(_.pid).distinct.size == all.size)
    all.foreach(p => assert(p.pid / 16 == p.hid))
  }

  test("ground truth DC violation fraction is zero on Spark too") {
    val (persons, _) = CensusData.generate(spark, scale = 0.05, nAreas = 4)
    assert(ErrorMeasures.dcViolationFraction(persons, CensusSchema.schema,
      ConstraintGen.sdcAll) == 0.0)
  }

  test("persons-per-home ratio is near the paper's 2.56") {
    val (persons, housing) = CensusData.generate(spark, scale = 0.2, nAreas = 4)
    val ratio = persons.count().toDouble / housing.count()
    assert(ratio > 1.8 && ratio < 3.2, s"ratio $ratio")
  }

  test("housing covers the requested areas and all tenures") {
    val (_, housing) = CensusData.generate(spark, scale = 0.2, nAreas = 4)
    val areas = housing.select("Area").distinct().collect().map(_.getString(0)).toSet
    assert(areas == (0 until 4).map(CensusSchema.areaName).toSet)
    val tenures = housing.select("Tenure").distinct().collect().map(_.getString(0)).toSet
    assert(tenures == CensusSchema.Tenures.toSet)
  }

  test("scaling doubles the table sizes") {
    val (p1, h1) = CensusData.generate(spark, 0.05, 4)
    val (p2, h2) = CensusData.generate(spark, 0.10, 4)
    assert(math.abs(h2.count() - 2 * h1.count()) <= 1) // truncation at 0.05×
    val ratio = p2.count().toDouble / p1.count()
    assert(ratio > 1.7 && ratio < 2.3)
  }

  test("blind() nulls the FK column and keeps everything else") {
    val (persons, _) = CensusData.generate(spark, 0.02, 4)
    val blinded = CensusData.blind(persons)
    assert(blinded.filter(col("hid").isNotNull).count() == 0)
    assert(blinded.count() == persons.count())
  }

  test("CC targets from the ground truth are internally consistent") {
    val (persons, housing) = CensusData.generate(spark, 0.05, 4)
    val gtJoin = persons.join(housing, Seq("hid"))
    val ccs = ConstraintGen.sccGood(gtJoin, nAreas = 4)
    // recounting on the same join must reproduce the targets exactly
    val errs = ErrorMeasures.ccRelErrors(gtJoin, ccs)
    assert(errs.forall(_ == 0.0))
    // and at least some CCs are non-trivial
    assert(ccs.count(_.target > 0) > 10)
  }
}
