package repro.ilp

/** Row sense of a linear constraint. */
sealed trait RowSense
object RowSense {
  case object Le extends RowSense
  case object Ge extends RowSense
  case object Eq extends RowSense
}

/** One linear constraint `Σ coeffs(j)·x_j  sense  rhs` (sparse coeffs). */
final case class LpRow(coeffs: Map[Int, Double], sense: RowSense, rhs: Double)

/** Minimize `objective · x` subject to `rows`, `x ≥ 0`. */
final case class LpProblem(nVars: Int, objective: Array[Double], rows: IndexedSeq[LpRow])

sealed trait LpStatus
object LpStatus {
  case object Optimal extends LpStatus
  case object Infeasible extends LpStatus
  case object IterationLimit extends LpStatus
  case object Unbounded extends LpStatus
}

final case class LpResult(status: LpStatus, x: Array[Double], objective: Double)

/** Dense two-phase primal simplex.
  *
  * This is the LP engine under the reproduction's ILP solver — the paper
  * uses PuLP, which is unavailable offline, so we build the substrate.
  * Standard-form conversion: every row is normalized to `rhs ≥ 0`, `≤` rows
  * get a slack, `≥` rows a surplus plus artificial, `=` rows an artificial.
  * Phase 1 minimizes the artificial sum; phase 2 the real objective.
  * Dantzig pricing with a Bland fallback kicks in after `blandAfter`
  * degenerate-looking iterations to guarantee termination.
  */
object Simplex {
  private val Eps = 1e-9

  def solve(p: LpProblem, maxIter: Int = 200000, blandAfter: Int = 20000): LpResult = {
    val m = p.rows.size
    val n = p.nVars

    // ---- standard-form layout: [x (n)] [slack/surplus] [artificial]
    val nSlack = p.rows.count(r => r.sense != RowSense.Eq)
    var slackAt = n
    val nArtStart = n + nSlack
    var artAt = nArtStart
    val rowSlack = Array.fill(m)(-1)
    val rowArt = Array.fill(m)(-1)
    // Count artificials first to size the tableau.
    val needsArt = p.rows.map { r =>
      val rhsNeg = r.rhs < 0
      r.sense match {
        case RowSense.Eq => true
        case RowSense.Le => rhsNeg  // flipped to ≥ form
        case RowSense.Ge => !rhsNeg // flipped to ≤ form when rhs < 0
      }
    }
    val nArt = needsArt.count(identity)
    val nTot = n + nSlack + nArt

    // tableau: m rows × (nTot + 1); last column is rhs
    val t = Array.ofDim[Double](m, nTot + 1)
    val basis = Array.fill(m)(-1)

    for (i <- 0 until m) {
      val r = p.rows(i)
      val sign = if (r.rhs < 0) -1.0 else 1.0
      r.coeffs.foreach { case (j, v) =>
        require(j >= 0 && j < n, s"coeff index $j out of range")
        t(i)(j) += sign * v
      }
      t(i)(nTot) = sign * r.rhs
      val effSense = r.sense match {
        case RowSense.Eq => RowSense.Eq
        case RowSense.Le => if (sign < 0) RowSense.Ge else RowSense.Le
        case RowSense.Ge => if (sign < 0) RowSense.Le else RowSense.Ge
      }
      effSense match {
        case RowSense.Le =>
          t(i)(slackAt) = 1.0; rowSlack(i) = slackAt; basis(i) = slackAt; slackAt += 1
        case RowSense.Ge =>
          t(i)(slackAt) = -1.0; rowSlack(i) = slackAt; slackAt += 1
          t(i)(artAt) = 1.0; rowArt(i) = artAt; basis(i) = artAt; artAt += 1
        case RowSense.Eq =>
          t(i)(artAt) = 1.0; rowArt(i) = artAt; basis(i) = artAt; artAt += 1
      }
    }

    var iter = 0

    /** Reduced-cost row for cost vector `c` under the current basis. */
    def reducedCosts(c: Array[Double]): Array[Double] = {
      val rc = Array.ofDim[Double](nTot + 1)
      System.arraycopy(c, 0, rc, 0, c.length)
      var i = 0
      while (i < m) {
        val cb = c(basis(i))
        if (cb != 0.0) {
          val row = t(i)
          var j = 0
          while (j <= nTot) { rc(j) -= cb * row(j); j += 1 }
        }
        i += 1
      }
      rc
    }

    def pivot(rc: Array[Double], pr: Int, pc: Int): Unit = {
      val prow = t(pr)
      val pv = prow(pc)
      var j = 0
      while (j <= nTot) { prow(j) /= pv; j += 1 }
      var i = 0
      while (i < m) {
        if (i != pr) {
          val f = t(i)(pc)
          if (math.abs(f) > Eps) {
            val row = t(i)
            var k = 0
            while (k <= nTot) { row(k) -= f * prow(k); k += 1 }
          }
        }
        i += 1
      }
      val fr = rc(pc)
      if (math.abs(fr) > Eps) {
        var k = 0
        while (k <= nTot) { rc(k) -= fr * prow(k); k += 1 }
      }
      basis(pr) = pc
    }

    /** Run simplex iterations for cost `c`; columns in `banned` never enter.
      * Returns Optimal / Unbounded / IterationLimit.
      */
    def run(c: Array[Double], banned: Int => Boolean): LpStatus = {
      val rc = reducedCosts(c)
      while (true) {
        iter += 1
        if (iter > maxIter) return LpStatus.IterationLimit
        val useBland = iter > blandAfter
        var pc = -1; var best = -1e-7
        var j = 0
        while (j < nTot && (pc == -1 || !useBland)) {
          if (!banned(j) && rc(j) < best) {
            pc = j; best = rc(j)
            if (useBland) j = nTot // first improving column under Bland
          }
          j += 1
        }
        if (pc == -1) return LpStatus.Optimal
        // ratio test
        var pr = -1; var bestRatio = Double.MaxValue
        var i = 0
        while (i < m) {
          val a = t(i)(pc)
          if (a > Eps) {
            val ratio = t(i)(nTot) / a
            if (ratio < bestRatio - Eps ||
                (ratio < bestRatio + Eps && (pr == -1 || basis(i) < basis(pr)))) {
              bestRatio = ratio; pr = i
            }
          }
          i += 1
        }
        if (pr == -1) return LpStatus.Unbounded
        pivot(rc, pr, pc)
      }
      LpStatus.Optimal // unreachable
    }

    // ---- phase 1
    if (nArt > 0) {
      val c1 = Array.ofDim[Double](nTot + 1)
      for (i <- 0 until m; if rowArt(i) >= 0) c1(rowArt(i)) = 1.0
      run(c1, _ => false) match {
        case LpStatus.Optimal =>
          val phase1Obj = (0 until m).map(i => if (rowArt(i) >= 0 && basis(i) == rowArt(i)) t(i)(nTot) else 0.0).sum
          if (phase1Obj > 1e-6) return LpResult(LpStatus.Infeasible, Array.ofDim(n), Double.NaN)
          // Pivot zero-level artificials out of the basis when possible.
          for (i <- 0 until m; if basis(i) >= nArtStart) {
            var pc = -1
            var j = 0
            while (j < nArtStart && pc == -1) {
              if (math.abs(t(i)(j)) > 1e-7) pc = j
              j += 1
            }
            if (pc >= 0) {
              val rcDummy = Array.ofDim[Double](nTot + 1)
              pivot(rcDummy, i, pc)
            } // else: redundant row; the basic artificial stays at level 0
          }
        case LpStatus.Unbounded =>
          return LpResult(LpStatus.Infeasible, Array.ofDim(n), Double.NaN)
        case other =>
          return LpResult(other, extract(n, nTot, m, basis, t), Double.NaN)
      }
    }

    // ---- phase 2 (artificial columns banned)
    val c2 = Array.ofDim[Double](nTot + 1)
    System.arraycopy(p.objective, 0, c2, 0, n)
    val status = run(c2, j => j >= nArtStart)
    val x = extract(n, nTot, m, basis, t)
    val obj = (0 until n).map(j => p.objective(j) * x(j)).sum
    LpResult(if (status == LpStatus.Unbounded) LpStatus.Unbounded else status, x, obj)
  }

  private def extract(n: Int, nTot: Int, m: Int,
                      basis: Array[Int], t: Array[Array[Double]]): Array[Double] = {
    val x = Array.ofDim[Double](n)
    for (i <- 0 until m; if basis(i) < n) x(basis(i)) = t(i)(nTot)
    x
  }
}
