package repro.milp

import org.scalatest.funsuite.AnyFunSuite

class SimplexSpec extends AnyFunSuite {

  private def lp(): LinearProgram = new LinearProgram

  test("unconstrained maximization hits upper bounds") {
    val p = lp()
    p.addVar("x", 0, 5, obj = 2.0)
    p.addVar("y", 0, 3, obj = 1.0)
    val Simplex.Optimal(x, obj) = Simplex.solve(p): @unchecked
    assert(math.abs(obj - 13.0) < 1e-6)
    assert(math.abs(x(0) - 5.0) < 1e-6 && math.abs(x(1) - 3.0) < 1e-6)
  }

  test("classic 2-var LP") {
    // max 3x + 5y s.t. x ≤ 4, 2y ≤ 12, 3x + 2y ≤ 18 → (2, 6), obj 36.
    val p = lp()
    val x = p.addVar("x", 0, 100, obj = 3.0)
    val y = p.addVar("y", 0, 100, obj = 5.0)
    p.le(x -> 1.0)(4.0)
    p.le(y -> 2.0)(12.0)
    p.le(x -> 3.0, y -> 2.0)(18.0)
    val Simplex.Optimal(sol, obj) = Simplex.solve(p): @unchecked
    assert(math.abs(obj - 36.0) < 1e-6)
    assert(math.abs(sol(x) - 2.0) < 1e-6 && math.abs(sol(y) - 6.0) < 1e-6)
  }

  test("equality constraints") {
    // max x + y s.t. x + y = 5, x − y = 1 → (3, 2).
    val p = lp()
    val x = p.addVar("x", -10, 10, obj = 1.0)
    val y = p.addVar("y", -10, 10, obj = 1.0)
    p.eq(x -> 1.0, y -> 1.0)(5.0)
    p.eq(x -> 1.0, y -> -1.0)(1.0)
    val Simplex.Optimal(sol, obj) = Simplex.solve(p): @unchecked
    assert(math.abs(obj - 5.0) < 1e-6)
    assert(math.abs(sol(x) - 3.0) < 1e-6 && math.abs(sol(y) - 2.0) < 1e-6)
  }

  test("infeasible system detected") {
    val p = lp()
    val x = p.addVar("x", 0, 10, obj = 1.0)
    p.ge(x -> 1.0)(5.0)
    p.le(x -> 1.0)(2.0)
    assert(Simplex.solve(p) == Simplex.Infeasible)
  }

  test("infeasible equalities detected") {
    val p = lp()
    val x = p.addVar("x", 0, 10)
    val y = p.addVar("y", 0, 10)
    p.eq(x -> 1.0, y -> 1.0)(3.0)
    p.eq(x -> 1.0, y -> 1.0)(4.0)
    assert(Simplex.solve(p) == Simplex.Infeasible)
  }

  test("negative lower bounds are handled by shifting") {
    // max −x s.t. x ≥ −3 → x = −3.
    val p = lp()
    val x = p.addVar("x", -3, 3, obj = -1.0)
    val Simplex.Optimal(sol, obj) = Simplex.solve(p): @unchecked
    assert(math.abs(sol(x) + 3.0) < 1e-6)
    assert(math.abs(obj - 3.0) < 1e-6)
  }

  test("ge constraints with negative rhs") {
    // max x s.t. −x ≥ −7 → x = 7 (within bound 10).
    val p = lp()
    val x = p.addVar("x", 0, 10, obj = 1.0)
    p.ge(x -> -1.0)(-7.0)
    val Simplex.Optimal(sol, _) = Simplex.solve(p): @unchecked
    assert(math.abs(sol(x) - 7.0) < 1e-6)
  }

  test("degenerate LP terminates (Bland)") {
    val p = lp()
    val x = p.addVar("x", 0, 10, obj = 1.0)
    val y = p.addVar("y", 0, 10, obj = 1.0)
    p.le(x -> 1.0, y -> 1.0)(0.0)
    p.le(x -> 2.0, y -> 1.0)(0.0)
    p.le(x -> 1.0, y -> 2.0)(0.0)
    val Simplex.Optimal(_, obj) = Simplex.solve(p): @unchecked
    assert(math.abs(obj) < 1e-6)
  }

  test("feasibility check agrees with the solver") {
    val p = lp()
    val x = p.addVar("x", 0, 4, obj = 1.0)
    val y = p.addVar("y", 0, 4, obj = 2.0)
    p.le(x -> 1.0, y -> 1.0)(5.0)
    val Simplex.Optimal(sol, _) = Simplex.solve(p): @unchecked
    assert(p.isFeasible(sol))
  }
}
