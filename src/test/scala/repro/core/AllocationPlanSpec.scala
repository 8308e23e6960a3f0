package repro.core

import repro.core.phase1.{Alloc, AllocationPlan, Binning, BinPool}
import repro.{PaperExample, SparkSpec}

class AllocationPlanSpec extends SparkSpec {
  import PaperExample.schema

  private def r1WithBin = {
    val r1 = PaperExample.r1(spark).drop("hid")
    val b = Binning.build(r1, schema, PaperExample.ccs)
    (b, b.withBinId(r1))
  }

  test("quota plan assigns exactly the requested counts") {
    val (b, df) = r1WithBin
    val ownerMl0 = b.bins.find(x => x.cats("Rel") == "Owner" && x.cats("MultiLing") == "0").get
    val out = AllocationPlan(df, schema, Seq(Alloc(ownerMl0.id, 0, 2)))
    val byCombo = out.groupBy("__combo").count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(byCombo(0) == 2)
    assert(byCombo(-1) == 7)
  }

  test("multiple allocs for the same bin split its tuples") {
    val (b, df) = r1WithBin
    val ownerMl1 = b.bins.find(x => x.cats("Rel") == "Owner" && x.cats("MultiLing") == "1").get
    val out = AllocationPlan(df, schema,
      Seq(Alloc(ownerMl1.id, 0, 2), Alloc(ownerMl1.id, 1, 1)))
    val rows = out.filter(out("Rel") === "Owner" && out("MultiLing") === "1")
      .groupBy("__combo").count().collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    assert(rows == Map(0 -> 2L, 1 -> 1L))
  }

  test("tuples within a bin are assigned deterministically by key order") {
    val (b, df) = r1WithBin
    val ownerMl0 = b.bins.find(x => x.cats("Rel") == "Owner" && x.cats("MultiLing") == "0").get
    val out1 = AllocationPlan(df, schema, Seq(Alloc(ownerMl0.id, 1, 1)))
    val out2 = AllocationPlan(df, schema, Seq(Alloc(ownerMl0.id, 1, 1)))
    val p1 = out1.filter(out1("__combo") === 1).select("pid").collect().map(_.getLong(0)).toSeq
    val p2 = out2.filter(out2("__combo") === 1).select("pid").collect().map(_.getLong(0)).toSeq
    assert(p1 == p2 && p1.size == 1)
  }

  test("empty plan leaves everything unassigned") {
    val (_, df) = r1WithBin
    val out = AllocationPlan(df, schema, Nil)
    assert(out.filter(out("__combo") === -1).count() == 9)
  }

  test("no tuple is assigned twice (row count preserved)") {
    val (b, df) = r1WithBin
    val allocs = b.bins.map(x => Alloc(x.id, 0, x.count))
    val out = AllocationPlan(df, schema, allocs)
    assert(out.count() == 9)
    assert(out.filter(out("__combo") === 0).count() == 9)
  }

  test("BinPool take clamps at availability and decrements") {
    val (b, _) = r1WithBin
    val pool = new BinPool(b.bins)
    val bin = b.bins.head
    assert(pool.take(bin.id, bin.count + 5) == bin.count)
    assert(pool.available(bin.id) == 0)
    assert(pool.take(bin.id, 1) == 0)
    assert(pool.remaining.forall(_._1 != bin.id))
  }
}
