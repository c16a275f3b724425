package repro.milp

import org.scalatest.funsuite.AnyFunSuite

class BruteForceMilpSpec extends AnyFunSuite {

  test("pure binary knapsack") {
    // max 10a + 6b + 4c s.t. a + b + c ≤ 2 (binaries) → a, b = 16.
    val p = new LinearProgram
    val a = p.addVar("a", 0, 1, isInt = true, obj = 10)
    val b = p.addVar("b", 0, 1, isInt = true, obj = 6)
    val c = p.addVar("c", 0, 1, isInt = true, obj = 4)
    p.le(a -> 1.0, b -> 1.0, c -> 1.0)(2.0)
    val sol = BruteForceMilp.solve(p).get
    assert(math.abs(sol.objective - 16.0) < 1e-9)
    assert(sol.x(a) > 0.5 && sol.x(b) > 0.5 && sol.x(c) < 0.5)
  }

  test("mixed integer-continuous") {
    // max y + z, y binary, z ∈ [0, 10]; z ≤ 3 + 4y → y = 1, z = 7.
    val p = new LinearProgram
    val y = p.addVar("y", 0, 1, isInt = true, obj = 1.0)
    val z = p.addVar("z", 0, 10, obj = 1.0)
    p.le(z -> 1.0, y -> -4.0)(3.0)
    val sol = BruteForceMilp.solve(p).get
    assert(math.abs(sol.objective - 8.0) < 1e-6)
  }

  test("infeasible integer problem returns None") {
    val p = new LinearProgram
    val y = p.addVar("y", 0, 1, isInt = true, obj = 1.0)
    p.ge(y -> 1.0)(0.5)
    p.le(y -> 1.0)(0.7)
    assert(BruteForceMilp.solve(p).isEmpty)
  }

  test("integer ranges beyond binary") {
    // max n s.t. 2n ≤ 7, n integer → 3.
    val p = new LinearProgram
    val n = p.addVar("n", 0, 10, isInt = true, obj = 1.0)
    p.le(n -> 2.0)(7.0)
    val sol = BruteForceMilp.solve(p).get
    assert(math.abs(sol.x(n) - 3.0) < 1e-9)
  }

  test("guards enumeration blow-up") {
    val p = new LinearProgram
    (0 until 40).foreach(i => p.addVar(s"b$i", 0, 1, isInt = true, obj = 1.0))
    assertThrows[IllegalArgumentException](BruteForceMilp.solve(p, maxAssignments = 1000))
  }
}
