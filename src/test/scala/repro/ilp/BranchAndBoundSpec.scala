package repro.ilp

import org.scalatest.funsuite.AnyFunSuite

class BranchAndBoundSpec extends AnyFunSuite {

  test("already-integral LP needs no branching") {
    val p = LpProblem(1, Array(1.0), IndexedSeq(LpRow(Map(0 -> 1.0), RowSense.Ge, 3.0)))
    val r = BranchAndBound.solve(p, 0 until 1)
    assert(r.isDefined && r.get.x(0) == 3L)
  }

  test("fractional knapsack corner gets branched to integer optimum") {
    // max 5x + 4y (min -5x -4y) s.t. 6x + 4y <= 24, x + 2y <= 6
    // LP optimum (3, 1.5); integer optimum x=4? 6*4=24>24 no: x=4,y=0: 6*4=24 ok obj 20? wait x<=4
    // Feasible integers: (4,0) → 20, (3,1) → 19, (2,3) violates 2nd (2+6=8>6) → best 20... check 6*4+0=24 ≤24, 4+0=4 ≤6 ✓
    val p = LpProblem(2, Array(-5.0, -4.0), IndexedSeq(
      LpRow(Map(0 -> 6.0, 1 -> 4.0), RowSense.Le, 24.0),
      LpRow(Map(0 -> 1.0, 1 -> 2.0), RowSense.Le, 6.0)))
    val r = BranchAndBound.solve(p, 0 until 2)
    assert(r.isDefined)
    val x = r.get.x
    assert(-5.0 * x(0) - 4.0 * x(1) <= -20.0 + 1e-6)
    assert(6 * x(0) + 4 * x(1) <= 24 && x(0) + 2 * x(1) <= 6)
  }

  test("infeasible problem returns None") {
    val p = LpProblem(1, Array(1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0), RowSense.Le, 1.0),
      LpRow(Map(0 -> 1.0), RowSense.Ge, 2.0)))
    assert(BranchAndBound.solve(p, 0 until 1).isEmpty)
  }

  test("equality with fractional relaxation: 2x = 5 has no integer solution, deviation absorbs") {
    // 2x + s+ - s- = 5, min s+ + s- → integer x must leave deviation 1 (x=2 or 3)
    val p = LpProblem(3, Array(0.0, 1.0, 1.0), IndexedSeq(
      LpRow(Map(0 -> 2.0, 1 -> 1.0, 2 -> -1.0), RowSense.Eq, 5.0)))
    val r = BranchAndBound.solve(p, 0 until 1)
    assert(r.isDefined)
    assert(math.abs(r.get.objective - 1.0) < 1e-6)
  }

  test("integer solution respects added bound rows") {
    // min x s.t. 3x >= 10 → LP x=10/3, integer x=4
    val p = LpProblem(1, Array(1.0), IndexedSeq(LpRow(Map(0 -> 3.0), RowSense.Ge, 10.0)))
    val r = BranchAndBound.solve(p, 0 until 1)
    assert(r.isDefined && r.get.x(0) == 4L)
  }

  test("multi-variable count system hits exact integers") {
    // x0+x1 = 7, x1+x2 = 5, x0+x2 = 4 → x = (3, 4, 1)
    val p = LpProblem(3, Array(0.0, 0.0, 0.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Eq, 7.0),
      LpRow(Map(1 -> 1.0, 2 -> 1.0), RowSense.Eq, 5.0),
      LpRow(Map(0 -> 1.0, 2 -> 1.0), RowSense.Eq, 4.0)))
    val r = BranchAndBound.solve(p, 0 until 3)
    assert(r.isDefined)
    assert(r.get.x.toSeq == Seq(3L, 4L, 1L))
  }
}
