package repro.milp

/** Dense two-phase primal simplex for the continuous relaxation of a
  * [[LinearProgram]].
  *
  * Built for small instances (tens to a few hundred variables): the EXP-3D
  * MILPs handed to it by [[BruteForceMilp]] have all integer variables fixed,
  * leaving only the refined-impact variables. Bland's rule guards against
  * cycling; a dense tableau keeps the code auditable.
  */
object Simplex {

  sealed trait Result
  final case class Optimal(x: IndexedSeq[Double], objective: Double) extends Result
  case object Infeasible extends Result
  case object Unbounded  extends Result

  private val Tol = 1e-9

  /** Solves `lp` ignoring integrality. Variables are shifted by their lower
    * bounds into `x' ≥ 0`; finite upper bounds become explicit rows.
    */
  def solve(lp: LinearProgram): Result = {
    val n = lp.variables.size
    if (n == 0) return Optimal(Vector.empty, 0.0)
    val lb = lp.variables.map(_.lb).toArray
    val ub = lp.variables.map(_.ub).toArray

    // Rows in "A x' (sense) b" form after the x = x' + lb shift.
    final case class Row(a: Array[Double], sense: lp.Sense, b: Double)
    val rows = scala.collection.mutable.ArrayBuffer.empty[Row]
    for (c <- lp.constraints) {
      val a = new Array[Double](n)
      var shift = 0.0
      c.coeffs.foreach { case (i, v) => a(i) += v; shift += v * lb(i) }
      rows += Row(a, c.sense, c.rhs - shift)
    }
    for (i <- 0 until n if ub(i) - lb(i) < 1e17) {
      val a = new Array[Double](n); a(i) = 1.0
      rows += Row(a, lp.Le, ub(i) - lb(i))
    }

    val m = rows.size
    // Standard form: equalities with slack/surplus, rhs ≥ 0, artificials
    // where no natural basis column exists.
    val nSlack = rows.count(_.sense != lp.Eq)
    val total0 = n + nSlack
    val a2 = Array.ofDim[Double](m, total0)
    val b2 = new Array[Double](m)
    val basisCandidate = new Array[Int](m) // slack col usable as basis, else -1
    var sIdx = 0
    for ((r, ri) <- rows.zipWithIndex) {
      var negate = r.b < 0
      val sign = if (negate) -1.0 else 1.0
      for (i <- 0 until n) a2(ri)(i) = sign * r.a(i)
      b2(ri) = sign * r.b
      r.sense match {
        case lp.Eq =>
          basisCandidate(ri) = -1
        case lp.Le =>
          a2(ri)(n + sIdx) = sign * 1.0
          basisCandidate(ri) = if (!negate) n + sIdx else -1
          sIdx += 1
        case lp.Ge =>
          a2(ri)(n + sIdx) = sign * -1.0
          basisCandidate(ri) = if (negate) n + sIdx else -1
          sIdx += 1
      }
    }
    val artRows = (0 until m).filter(basisCandidate(_) == -1)
    val nArt = artRows.size
    val total = total0 + nArt
    val tab = Array.ofDim[Double](m, total)
    for (ri <- 0 until m; j <- 0 until total0) tab(ri)(j) = a2(ri)(j)
    artRows.zipWithIndex.foreach { case (ri, k) => tab(ri)(total0 + k) = 1.0 }
    val basis = new Array[Int](m)
    for (ri <- 0 until m) basis(ri) = basisCandidate(ri)
    artRows.zipWithIndex.foreach { case (ri, k) => basis(ri) = total0 + k }

    def pivot(cost: Array[Double], allowCols: Int => Boolean): Boolean = {
      // Returns false on unboundedness. cost is reduced-cost row for a
      // minimization; terminates when all reduced costs ≥ -Tol (Bland).
      var iter = 0
      val maxIter = 200 * (m + total) + 2000
      while (iter < maxIter) {
        iter += 1
        var enter = -1
        var j = 0
        while (j < total && enter == -1) {
          if (allowCols(j) && cost(j) < -Tol) enter = j
          j += 1
        }
        if (enter == -1) return true // optimal
        var leave = -1
        var best = Double.PositiveInfinity
        var ri = 0
        while (ri < m) {
          val a = tab(ri)(enter)
          if (a > Tol) {
            val ratio = b2(ri) / a
            if (ratio < best - Tol || (math.abs(ratio - best) <= Tol &&
                (leave == -1 || basis(ri) < basis(leave)))) {
              best = ratio; leave = ri
            }
          }
          ri += 1
        }
        if (leave == -1) return false // unbounded
        // Pivot on (leave, enter).
        val pv = tab(leave)(enter)
        var c = 0
        while (c < total) { tab(leave)(c) /= pv; c += 1 }
        b2(leave) /= pv
        var r2 = 0
        while (r2 < m) {
          if (r2 != leave) {
            val f = tab(r2)(enter)
            if (math.abs(f) > Tol) {
              var cc = 0
              while (cc < total) { tab(r2)(cc) -= f * tab(leave)(cc); cc += 1 }
              b2(r2) -= f * b2(leave)
            }
          }
          r2 += 1
        }
        val f = cost(enter)
        if (math.abs(f) > Tol) {
          var cc = 0
          while (cc < total) { cost(cc) -= f * tab(leave)(cc); cc += 1 }
        }
        basis(leave) = enter
      }
      throw new IllegalStateException("simplex iteration limit exceeded")
    }

    // Phase 1: minimize sum of artificials.
    if (nArt > 0) {
      val cost = new Array[Double](total)
      for (k <- 0 until nArt) cost(total0 + k) = 1.0
      // Reduce cost row against the starting basis.
      var phase1Obj = 0.0
      for (ri <- 0 until m if basis(ri) >= total0) {
        for (c <- 0 until total) cost(c) -= tab(ri)(c)
        phase1Obj += b2(ri)
      }
      if (!pivot(cost, _ => true)) return Infeasible // cannot be unbounded; safety
      // Residual artificial value = -(reduced objective change); recompute directly.
      val artVal = (0 until m).iterator
        .filter(ri => basis(ri) >= total0)
        .map(ri => b2(ri))
        .sum
      if (artVal > 1e-6) return Infeasible
      // Drive any remaining artificial basis variables out where possible.
      for (ri <- 0 until m if basis(ri) >= total0) {
        var j = 0
        var found = -1
        while (j < total0 && found == -1) {
          if (math.abs(tab(ri)(j)) > 1e-7) found = j
          j += 1
        }
        if (found >= 0) {
          val pv = tab(ri)(found)
          for (c <- 0 until total) tab(ri)(c) /= pv
          b2(ri) /= pv
          for (r2 <- 0 until m if r2 != ri) {
            val f = tab(r2)(found)
            if (math.abs(f) > Tol) {
              for (cc <- 0 until total) tab(r2)(cc) -= f * tab(ri)(cc)
              b2(r2) -= f * b2(ri)
            }
          }
          basis(ri) = found
        }
        // A redundant all-zero row keeps its artificial at value 0 — harmless.
      }
    }

    // Phase 2: maximize lp objective == minimize negation; artificials barred.
    val cost = new Array[Double](total)
    for (i <- 0 until n) cost(i) = -lp.variables(i).obj
    for (ri <- 0 until m if basis(ri) < total0) {
      val f = cost(basis(ri))
      if (math.abs(f) > Tol) {
        for (c <- 0 until total) cost(c) -= f * tab(ri)(c)
      }
    }
    // Zero out basic columns' residuals for numerical hygiene.
    if (!pivot(cost, j => j < total0)) return Unbounded

    val x = new Array[Double](n)
    for (ri <- 0 until m if basis(ri) < n) x(basis(ri)) = b2(ri)
    val res = (0 until n).map(i => x(i) + lb(i))
    Optimal(res, lp.objective(res))
  }
}
