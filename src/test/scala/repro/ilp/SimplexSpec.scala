package repro.ilp

import org.scalatest.funsuite.AnyFunSuite

class SimplexSpec extends AnyFunSuite {
  private def approx(a: Double, b: Double, tol: Double = 1e-6): Boolean = math.abs(a - b) < tol

  test("trivial LP: min x s.t. x >= 3") {
    val p = LpProblem(1, Array(1.0), IndexedSeq(LpRow(Map(0 -> 1.0), RowSense.Ge, 3.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.x(0), 3.0))
  }

  test("maximize via negated objective: max x+y, x+y <= 4") {
    val p = LpProblem(2, Array(-1.0, -1.0),
      IndexedSeq(LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Le, 4.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.x(0) + r.x(1), 4.0))
  }

  test("classic 2-var LP") {
    // min -3x - 5y s.t. x <= 4, 2y <= 12, 3x + 2y <= 18 → x=2, y=6, obj=-36
    val p = LpProblem(2, Array(-3.0, -5.0), IndexedSeq(
      LpRow(Map(0 -> 1.0), RowSense.Le, 4.0),
      LpRow(Map(1 -> 2.0), RowSense.Le, 12.0),
      LpRow(Map(0 -> 3.0, 1 -> 2.0), RowSense.Le, 18.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.x(0), 2.0) && approx(r.x(1), 6.0))
    assert(approx(r.objective, -36.0))
  }

  test("equality system with unique solution") {
    // x + y = 10, x - y = 4 → x=7, y=3 (any objective)
    val p = LpProblem(2, Array(0.0, 0.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Eq, 10.0),
      LpRow(Map(0 -> 1.0, 1 -> -1.0), RowSense.Eq, 4.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.x(0), 7.0) && approx(r.x(1), 3.0))
  }

  test("infeasible: x <= 1 and x >= 2") {
    val p = LpProblem(1, Array(1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0), RowSense.Le, 1.0),
      LpRow(Map(0 -> 1.0), RowSense.Ge, 2.0)))
    assert(Simplex.solve(p).status == LpStatus.Infeasible)
  }

  test("infeasible equality: x + y = -1 with x,y >= 0") {
    val p = LpProblem(2, Array(1.0, 1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Eq, -1.0)))
    assert(Simplex.solve(p).status == LpStatus.Infeasible)
  }

  test("unbounded: min -x with no constraint binding x") {
    val p = LpProblem(1, Array(-1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0), RowSense.Ge, 0.0)))
    assert(Simplex.solve(p).status == LpStatus.Unbounded)
  }

  test("negative rhs rows are normalized") {
    // -x <= -5  ⇔  x >= 5
    val p = LpProblem(1, Array(1.0), IndexedSeq(
      LpRow(Map(0 -> -1.0), RowSense.Le, -5.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal && approx(r.x(0), 5.0))
  }

  test("redundant constraints do not break optimality") {
    val p = LpProblem(2, Array(1.0, 1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Eq, 6.0),
      LpRow(Map(0 -> 2.0, 1 -> 2.0), RowSense.Eq, 12.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.x(0) + r.x(1), 6.0))
  }

  test("degenerate LP terminates") {
    val p = LpProblem(3, Array(-1.0, -1.0, -1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0), RowSense.Le, 0.0),
      LpRow(Map(1 -> 1.0, 2 -> 1.0), RowSense.Le, 0.0),
      LpRow(Map(0 -> 1.0, 2 -> 1.0), RowSense.Le, 0.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.objective, 0.0))
  }

  test("L1-style formulation: deviations absorb an inconsistent target") {
    // x + s+ - s- = 5, x <= 3, min s+ + s- → x=3, s+=2
    val p = LpProblem(3, Array(0.0, 1.0, 1.0), IndexedSeq(
      LpRow(Map(0 -> 1.0, 1 -> 1.0, 2 -> -1.0), RowSense.Eq, 5.0),
      LpRow(Map(0 -> 1.0), RowSense.Le, 3.0)))
    val r = Simplex.solve(p)
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.objective, 2.0))
    assert(approx(r.x(0), 3.0))
  }

  test("medium random consistent system solves to zero deviation") {
    // Random 0/1 matrix with known integer solution; L1 slack objective = 0.
    val rng = new scala.util.Random(7)
    val n = 40; val m = 15
    val xTrue = Array.fill(n)(rng.nextInt(5).toDouble)
    val rows = (0 until m).map { _ =>
      val coeffs = (0 until n).filter(_ => rng.nextBoolean()).map(_ -> 1.0).toMap
      val b = coeffs.keys.map(xTrue).sum
      LpRow(coeffs, RowSense.Eq, b)
    }
    // add deviation vars per row
    val obj = Array.fill(n)(0.0) ++ Array.fill(2 * m)(1.0)
    val rows2 = rows.zipWithIndex.map { case (r, i) =>
      LpRow(r.coeffs ++ Map(n + i -> 1.0, n + m + i -> -1.0), RowSense.Eq, r.rhs)
    }
    val r = Simplex.solve(LpProblem(n + 2 * m, obj, rows2))
    assert(r.status == LpStatus.Optimal)
    assert(approx(r.objective, 0.0, 1e-5))
  }

  test("coefficients out of range are rejected") {
    val p = LpProblem(1, Array(1.0), IndexedSeq(LpRow(Map(3 -> 1.0), RowSense.Le, 1.0)))
    assertThrows[IllegalArgumentException](Simplex.solve(p))
  }
}
