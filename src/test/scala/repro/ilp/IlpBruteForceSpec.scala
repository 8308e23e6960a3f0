package repro.ilp

import org.scalatest.funsuite.AnyFunSuite

/** Exhaustive cross-check: on tiny instances, the ILP facade must match the
  * brute-force integer optimum of the L1 objective.
  */
class IlpBruteForceSpec extends AnyFunSuite {

  private def bruteForce(inst: CountIlp, maxVal: Long): Double = {
    val n = inst.nVars
    var best = Double.MaxValue
    def ok(x: Array[Long]): Boolean = inst.hard.forall { r =>
      val v = r.coeffs.map { case (j, a) => a * x(j) }.sum
      r.sense match {
        case RowSense.Le => v <= r.rhs + 1e-9
        case RowSense.Ge => v >= r.rhs - 1e-9
        case RowSense.Eq => math.abs(v - r.rhs) < 1e-9
      }
    }
    def rec(i: Int, x: Array[Long]): Unit =
      if (i == n) { if (ok(x)) best = math.min(best, IlpSolver.l1(inst, x)) }
      else (0L to maxVal).foreach { v => x(i) = v; rec(i + 1, x) }
    rec(0, Array.fill(n)(0L))
    best
  }

  private def randomInstance(seed: Int, n: Int, m: Int, withHard: Boolean): CountIlp = {
    val rng = new scala.util.Random(seed)
    val soft = IndexedSeq.fill(m) {
      val coeffs = (0 until n).filter(_ => rng.nextBoolean()).map(_ -> 1.0).toMap
      SoftRow(if (coeffs.isEmpty) Map(0 -> 1.0) else coeffs, rng.nextInt(7).toDouble)
    }
    val hard =
      if (!withHard) IndexedSeq.empty[LpRow]
      else IndexedSeq(LpRow((0 until n).map(_ -> 1.0).toMap, RowSense.Le, (n + 2).toDouble))
    CountIlp(n, soft, hard)
  }

  for (seed <- 1 to 12) {
    test(s"solver matches brute-force optimum on random instance $seed") {
      val withHard = seed % 2 == 0
      val inst = randomInstance(seed, n = 4, m = 3, withHard)
      val got = IlpSolver.solve(inst)
      val opt = bruteForce(inst, maxVal = 7)
      assert(got.l1Error <= opt + 1e-9 || got.l1Error == opt,
        s"solver l1=${got.l1Error} vs brute-force optimum $opt (x=${got.x.toSeq})")
      // solver can never beat the true optimum
      assert(got.l1Error >= opt - 1e-9)
    }
  }
}
