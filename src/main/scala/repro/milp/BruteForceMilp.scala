package repro.milp

/** Exhaustive MILP solver for *small* instances: enumerates every assignment
  * of the integer variables over their (integral) ranges and solves the
  * remaining continuous problem with [[Simplex]].
  *
  * This is the reference oracle used by tests to validate both the MILP
  * encoding of the EXP-3D problem (`repro.core.MilpBuilder`) and the
  * production branch-and-bound solver (`repro.core.ExplainSolver`). It is
  * exponential in the number of integer variables by design — callers guard
  * instance sizes.
  */
object BruteForceMilp {

  final case class Solution(x: IndexedSeq[Double], objective: Double)

  /** Returns the optimal solution, or None if infeasible. Throws if the
    * enumeration space exceeds `maxAssignments`.
    */
  def solve(lp: LinearProgram, maxAssignments: Long = 5_000_000L): Option[Solution] = {
    val intIdx = lp.intVarIndices.toArray
    val ranges = intIdx.map { i =>
      val v = lp.variables(i)
      val lo = math.ceil(v.lb - 1e-9).toLong
      val hi = math.floor(v.ub + 1e-9).toLong
      (lo, hi)
    }
    val space = ranges.foldLeft(1L) { case (acc, (lo, hi)) =>
      val w = hi - lo + 1
      if (acc > maxAssignments / math.max(w, 1)) Long.MaxValue else acc * w
    }
    require(space <= maxAssignments, s"integer space too large for brute force: $space")

    var best: Option[Solution] = None
    val assignment = ranges.map(_._1)

    def continuousSolve(): Option[Solution] = {
      // Build a copy of lp with the integer variables pinned to `assignment`.
      val sub = new LinearProgram
      for ((v, i) <- lp.variables.zipWithIndex) {
        val k = intIdx.indexOf(i)
        if (k >= 0) {
          val a = assignment(k).toDouble
          sub.addVar(v.name, a, a, isInt = false, obj = v.obj)
        } else sub.addVar(v.name, v.lb, v.ub, isInt = false, obj = v.obj)
      }
      for (c <- lp.constraints)
        sub.addConstraint(c.coeffs, c.sense match {
          case lp.Le => sub.Le
          case lp.Eq => sub.Eq
          case lp.Ge => sub.Ge
        }, c.rhs, c.name)
      Simplex.solve(sub) match {
        case Simplex.Optimal(x, obj) => Some(Solution(x, obj))
        case _                       => None
      }
    }

    def recurse(d: Int): Unit = {
      if (d == intIdx.length) {
        continuousSolve().foreach { s =>
          if (best.forall(_.objective < s.objective - 1e-12)) best = Some(s)
        }
      } else {
        var v = ranges(d)._1
        while (v <= ranges(d)._2) {
          assignment(d) = v
          recurse(d + 1)
          v += 1
        }
      }
    }
    recurse(0)
    best
  }
}
