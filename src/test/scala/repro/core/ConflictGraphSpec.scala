package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.model._
import repro.core.model.CmpOp._
import repro.core.phase2.ConflictGraph

class ConflictGraphSpec extends AnyFunSuite {
  private val ownerOwner = DenialConstraint("oo",
    Seq(SelCond(Seq(CatEq("Rel", "Owner"))), SelCond(Seq(CatEq("Rel", "Owner")))), Nil)
  private val spouseGapLow = DenialConstraint("gapLow",
    Seq(SelCond(Seq(CatEq("Rel", "Owner"))), SelCond(Seq(CatEq("Rel", "Spouse")))),
    Seq(CrossCond(1, "Age", Lt, 0, "Age", -50)))

  private def t(rel: String, age: Int): Map[String, Any] = Map("Rel" -> rel, "Age" -> age)

  test("two owners create one deduplicated edge") {
    val edges = ConflictGraph.edges(IndexedSeq(t("Owner", 40), t("Owner", 50)), Seq(ownerOwner))
    assert(edges == Vector(Vector(0, 1)))
  }

  test("three owners create a triangle") {
    val edges = ConflictGraph.edges(
      IndexedSeq(t("Owner", 40), t("Owner", 50), t("Owner", 60)), Seq(ownerOwner))
    assert(edges.toSet == Set(Vector(0, 1), Vector(0, 2), Vector(1, 2)))
  }

  test("owner and spouse with acceptable gap: no edge") {
    val edges = ConflictGraph.edges(
      IndexedSeq(t("Owner", 60), t("Spouse", 40)), Seq(spouseGapLow))
    assert(edges.isEmpty)
  }

  test("asymmetric DC matches in the violating orientation") {
    val edges = ConflictGraph.edges(
      IndexedSeq(t("Spouse", 20), t("Owner", 90)), Seq(spouseGapLow))
    assert(edges == Vector(Vector(0, 1)))
  }

  test("multiple DCs accumulate edges without duplicates") {
    val tuples = IndexedSeq(t("Owner", 90), t("Owner", 30), t("Spouse", 20))
    val edges = ConflictGraph.edges(tuples, Seq(ownerOwner, spouseGapLow))
    // owner-owner edge (0,1); spouse too young for owner 90 → (0,2)
    assert(edges.toSet == Set(Vector(0, 1), Vector(0, 2)))
  }

  test("slot filtering: unrelated tuples produce no candidates") {
    val tuples = IndexedSeq(t("Sibling", 40), t("Housemate", 30))
    assert(ConflictGraph.edges(tuples, Seq(ownerOwner, spouseGapLow)).isEmpty)
  }

  test("arity-3 DC produces hyperedges of size 3") {
    val sameCls = DenialConstraint("cls",
      Seq(SelCond.empty, SelCond.empty, SelCond.empty),
      Seq(CrossCond(0, "Cls", EqOp, 1, "Cls", 0), CrossCond(1, "Cls", EqOp, 2, "Cls", 0)))
    def u(i: Int, c: Int): Map[String, Any] = Map("Cls" -> c, "id" -> i)
    val tuples = IndexedSeq(u(0, 1), u(1, 1), u(2, 1), u(3, 2))
    val edges = ConflictGraph.edges(tuples, Seq(sameCls))
    assert(edges == Vector(Vector(0, 1, 2)))
  }

  test("empty tuple set and empty DC set both give no edges") {
    assert(ConflictGraph.edges(IndexedSeq.empty, Seq(ownerOwner)).isEmpty)
    assert(ConflictGraph.edges(IndexedSeq(t("Owner", 40)), Nil).isEmpty)
  }

  test("a single tuple never forms an edge with itself") {
    assert(ConflictGraph.edges(IndexedSeq(t("Owner", 40)), Seq(ownerOwner)).isEmpty)
  }

  test("paper Figure 7: owners 1,2 conflict; child pair does not") {
    // Tuples 1,2 are both owners; 6,7 are children (no DC among children)
    val tuples = IndexedSeq(t("Owner", 75), t("Owner", 75), t("Child", 10), t("Child", 10))
    val edges = ConflictGraph.edges(tuples, Seq(ownerOwner))
    assert(edges == Vector(Vector(0, 1)))
  }
}
