package repro.core

import repro.core.ccrel.HasseDiagram
import repro.core.model._
import repro.core.phase1._
import repro.{PaperExample, SparkSpec}

class HasseCompleterSpec extends SparkSpec {
  import PaperExample.schema

  private def fixture(ccs: Seq[CardinalityConstraint]) = {
    val r1 = PaperExample.r1(spark).drop("hid")
    val binning = Binning.build(r1, schema, ccs)
    val comboSpace = ComboSpace.build(PaperExample.r2(spark), schema)
    val pool = new BinPool(binning.bins)
    val forest = HasseDiagram.split(ccs, schema).forest
    (binning, comboSpace, pool, forest)
  }

  private def cc(id: String, target: Long, preds: Pred*) =
    CardinalityConstraint(id, SelCond(preds), target)

  test("disjoint CCs are satisfied exactly (base case, Lemma A.1)") {
    val ccs = Seq(
      cc("owners_chi", 4, CatEq("Rel", "Owner"), CatEq("Area", "Chicago")),
      cc("owners_nyc", 2, CatEq("Rel", "Owner"), CatEq("Area", "NYC")))
    val (binning, comboSpace, pool, forest) = fixture(ccs)
    val res = HasseCompleter.plan(forest, ccs, schema, binning, comboSpace, pool)
    assert(res.shortfalls.isEmpty)
    val chi = comboSpace.combos.find(_.values("Area") == "Chicago").get.id
    val nyc = comboSpace.combos.find(_.values("Area") == "NYC").get.id
    assert(res.allocs.filter(_.comboId == chi).map(_.count).sum == 4)
    assert(res.allocs.filter(_.comboId == nyc).map(_.count).sum == 2)
  }

  test("containment chain: child filled first, parent remainder avoids child bins") {
    val parent = cc("parent", 4, CatEq("Rel", "Owner"), CatEq("Area", "Chicago"))
    val child = cc("child", 2, CatEq("Rel", "Owner"), CatEq("MultiLing", "1"),
                   CatEq("Area", "Chicago"))
    val ccs = Seq(parent, child)
    val (binning, comboSpace, pool, forest) = fixture(ccs)
    val res = HasseCompleter.plan(forest, ccs, schema, binning, comboSpace, pool)
    assert(res.shortfalls.isEmpty)
    val ml1Bin = binning.bins.find(b =>
      b.cats("Rel") == "Owner" && b.cats("MultiLing") == "1").get
    val ml0Bin = binning.bins.find(b =>
      b.cats("Rel") == "Owner" && b.cats("MultiLing") == "0").get
    // child takes 2 from the ml=1 bin; parent remainder (2) must use ml=0
    assert(res.allocs.filter(_.binId == ml1Bin.id).map(_.count).sum == 2)
    assert(res.allocs.filter(_.binId == ml0Bin.id).map(_.count).sum == 2)
  }

  test("containment via R2 attributes: Area-only parent over a per-tenure child") {
    // parent counts all owners in Chicago; child only those in a 'proxy'
    // sub-combo — here both combos share the Area so use MultiLing instead.
    val parent = cc("p", 3, CatEq("Rel", "Owner"), CatEq("Area", "Chicago"))
    val child = cc("c", 1, CatEq("Rel", "Owner"), CatEq("MultiLing", "0"),
                   CatEq("Area", "Chicago"))
    val ccs = Seq(parent, child)
    val (binning, comboSpace, pool, forest) = fixture(ccs)
    val res = HasseCompleter.plan(forest, ccs, schema, binning, comboSpace, pool)
    assert(res.shortfalls.isEmpty)
    assert(res.allocs.map(_.count).sum == 3)
  }

  test("unsatisfiable target reports a shortfall") {
    val ccs = Seq(cc("too_many", 50, CatEq("Rel", "Owner"), CatEq("Area", "Chicago")))
    val (binning, comboSpace, pool, forest) = fixture(ccs)
    val res = HasseCompleter.plan(forest, ccs, schema, binning, comboSpace, pool)
    assert(res.shortfalls.nonEmpty)
    assert(res.shortfalls.head._1 == "too_many")
    assert(res.shortfalls.head._2 == 44) // only 6 owners exist
  }

  test("allocations never exceed bin availability") {
    val ccs = Seq(
      cc("a", 3, CatEq("Rel", "Owner"), CatEq("Area", "Chicago")),
      cc("b", 3, CatEq("Rel", "Owner"), CatEq("Area", "NYC")))
    val (binning, comboSpace, pool, forest) = fixture(ccs)
    val res = HasseCompleter.plan(forest, ccs, schema, binning, comboSpace, pool)
    val perBin = res.allocs.groupBy(_.binId).view.mapValues(_.map(_.count).sum)
    perBin.foreach { case (binId, used) =>
      assert(used <= binning.bins(binId).count)
    }
    assert(res.shortfalls.isEmpty)
  }

  test("empty forest yields empty plan") {
    val (binning, comboSpace, pool, _) = fixture(Nil)
    val res = HasseCompleter.plan(
      repro.core.ccrel.HasseForest(Nil), Nil, schema, binning, comboSpace, pool)
    assert(res.allocs.isEmpty && res.shortfalls.isEmpty)
  }
}
