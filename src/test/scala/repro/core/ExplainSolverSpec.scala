package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._

class ExplainSolverSpec extends AnyFunSuite {

  private val params = Params(0.9, 0.9)

  test("fig3 (Q1 vs Q2): full evidence, CSE value change, nothing deleted") {
    val inst = new ScoringSpec().fig3
    val sol = ExplainSolver.solve(inst)
    assert(sol.proved)
    assert(sol.explanations.evidence == inst.matches.map(m => (m.left, m.right)).toSet)
    assert(sol.explanations.delta.isEmpty)
    assert(sol.explanations.values.keySet == Set(11L))
    assert(sol.explanations.values(11L).newImpact == 2.0)
    // Solver score must equal the scoring function on the decoded set.
    assert(math.abs(sol.logProb - Scoring.logProb(inst, sol.explanations)) < 1e-9)
  }

  /** Q2 vs Q3 of the running example: program ⊑ college, CSE ambiguous
    * between Computer Science and Engineering (Section 2.3's argument).
    */
  test("running example Q2 vs Q3 resolves CSE to Computer Science") {
    val t1 = Vector(
      CTuple(0, 1, Seq("accounting"), 1), CTuple(1, 1, Seq("cse"), 1),
      CTuple(2, 1, Seq("ece"), 1), CTuple(3, 1, Seq("ee"), 1),
      CTuple(4, 1, Seq("management"), 1), CTuple(5, 1, Seq("design"), 1))
    val t2 = Vector(
      CTuple(10, 2, Seq("business"), 2),
      CTuple(11, 2, Seq("engineering"), 2),
      CTuple(12, 2, Seq("computer science"), 1))
    val ms = Vector(
      TupleMatch(0, 10, 0.8), TupleMatch(4, 10, 0.8),
      TupleMatch(2, 11, 0.8), TupleMatch(3, 11, 0.8),
      TupleMatch(1, 12, 0.6), TupleMatch(1, 11, 0.5))
    val inst = Instance(t1, t2, ms, Phi.LessGeneral, params)
    val sol = ExplainSolver.solve(inst)
    assert(sol.proved)
    assert(sol.explanations.evidence ==
      Set((0L, 10L), (4L, 10L), (2L, 11L), (3L, 11L), (1L, 12L)))
    assert(sol.explanations.delta == Set(5L), "design is the only mismatched tuple")
    assert(sol.explanations.values.isEmpty, "all stars balance")
  }

  test("record-linkage counterexample from Section 5.2 (A/B vs A'/B')") {
    // Initial mapping {(A,A',0.8), (B,B',0.8), (A,B',0.9), (B,A',0.5)}:
    // linkage picks (A,B'); explain3D picks (A,A'), (B,B') to avoid
    // unmatched tuples.
    val t1 = Vector(CTuple(0, 1, Seq("A"), 1), CTuple(1, 1, Seq("B"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("A'"), 1), CTuple(11, 2, Seq("B'"), 1))
    val ms = Vector(
      TupleMatch(0, 10, 0.8), TupleMatch(1, 11, 0.8),
      TupleMatch(0, 11, 0.9), TupleMatch(1, 10, 0.5))
    val inst = Instance(t1, t2, ms, Phi.Equiv, params)
    val sol = ExplainSolver.solve(inst)
    assert(sol.explanations.evidence == Set((0L, 10L), (1L, 11L)))
    assert(sol.explanations.delta.isEmpty)
  }

  test("unmatched tuples are deleted (not zeroed) under default priors") {
    val inst = Instance(
      Vector(CTuple(0, 1, Seq("only"), 3)), Vector.empty, Vector.empty, Phi.Equiv, params)
    val sol = ExplainSolver.solve(inst)
    assert(sol.explanations.delta == Set(0L))
    assert(math.abs(sol.logProb - params.costDelete) < 1e-12)
  }

  test("zero-impact unmatched tuple is kept for free") {
    val inst = Instance(
      Vector(CTuple(0, 1, Seq("zero"), 0)), Vector.empty, Vector.empty, Phi.Equiv, params)
    val sol = ExplainSolver.solve(inst)
    assert(sol.explanations.delta.isEmpty && sol.explanations.values.isEmpty)
    assert(math.abs(sol.logProb - params.costKeep) < 1e-12)
  }

  test("low-probability match is rejected when mismatch cost is lower") {
    // p = 0.05: selecting costs log(.05) − log(.95) ≈ −2.94 relative, versus
    // deleting both tuples: 2·costDelete − 2·costKeep ≈ −4.18... here
    // selecting with a value fix may still win; verify against brute force.
    val t1 = Vector(CTuple(0, 1, Seq("x"), 5))
    val t2 = Vector(CTuple(10, 2, Seq("y"), 1))
    val inst = Instance(t1, t2, Vector(TupleMatch(0, 10, 0.05)), Phi.Equiv, params)
    val sol = ExplainSolver.solve(inst)
    val (_, bestScore) = SemanticBruteForce.solve(inst)
    assert(math.abs(sol.logProb - bestScore) < 1e-9)
  }

  test("matches brute force on the fig3 instance") {
    val inst = new ScoringSpec().fig3
    val sol = ExplainSolver.solve(inst)
    val (_, bestScore) = SemanticBruteForce.solve(inst)
    assert(math.abs(sol.logProb - bestScore) < 1e-9)
  }

  test("solver solution is always complete") {
    val inst = new ScoringSpec().fig3
    val sol = ExplainSolver.solve(inst)
    assert(Scoring.completenessViolation(inst, sol.explanations).isEmpty)
  }

  test("node cap returns an incumbent with proved = false") {
    val t1 = (0 until 8).map(i => CTuple(i, 1, Seq(s"a$i"), 1)).toVector
    val t2 = (0 until 8).map(i => CTuple(100 + i, 2, Seq(s"b$i"), 1)).toVector
    val ms = (for (i <- 0 until 8; j <- 0 until 8) yield TupleMatch(i, 100 + j, 0.6)).toVector
    val inst = Instance(t1, t2, ms, Phi.Equiv, params)
    val sol = ExplainSolver.solve(inst, ExplainSolver.Config(nodeCap = 5, timeLimitMs = 60000))
    assert(!sol.proved)
    assert(Scoring.completenessViolation(inst, sol.explanations).isEmpty)
  }

  test("duplicate matches are rejected") {
    val t1 = Vector(CTuple(0, 1, Seq("x"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("x"), 1))
    val ms = Vector(TupleMatch(0, 10, 0.9), TupleMatch(0, 10, 0.8))
    assertThrows[IllegalArgumentException](
      ExplainSolver.solve(Instance(t1, t2, ms, Phi.Equiv, params)))
  }

  test("⊒ orientation: hubs on the left side") {
    // One left tuple (aggregate) maps to two right tuples.
    val t1 = Vector(CTuple(0, 1, Seq("college"), 2))
    val t2 = Vector(CTuple(10, 2, Seq("prog a"), 1), CTuple(11, 2, Seq("prog b"), 1))
    val ms = Vector(TupleMatch(0, 10, 0.9), TupleMatch(0, 11, 0.9))
    val inst = Instance(t1, t2, ms, Phi.MoreGeneral, params)
    val sol = ExplainSolver.solve(inst)
    assert(sol.explanations.evidence == Set((0L, 10L), (0L, 11L)))
    assert(sol.explanations.delta.isEmpty && sol.explanations.values.isEmpty)
  }

  test("randomized instances match the semantic brute force") {
    val rnd = new scala.util.Random(1234)
    val probs = Array(0.2, 0.4, 0.6, 0.9, 0.95)
    for (trial <- 0 until 60) {
      val n1 = 1 + rnd.nextInt(3)
      val n2 = 1 + rnd.nextInt(3)
      val t1 = (0 until n1).map(i => CTuple(i, 1, Seq(s"l$i"), rnd.nextInt(4))).toVector
      val t2 = (0 until n2).map(i => CTuple(100 + i, 2, Seq(s"r$i"), rnd.nextInt(4))).toVector
      val ms = (for {
        i <- 0 until n1; j <- 0 until n2 if rnd.nextDouble() < 0.7
      } yield TupleMatch(i, 100 + j, probs(rnd.nextInt(probs.length)))).toVector
      val phi = Seq(Phi.Equiv, Phi.LessGeneral, Phi.MoreGeneral)(rnd.nextInt(3))
      val inst = Instance(t1, t2, ms, phi, params)
      val sol = ExplainSolver.solve(inst)
      val (_, bestScore) = SemanticBruteForce.solve(inst)
      assert(sol.proved, s"trial $trial should be proved")
      assert(math.abs(sol.logProb - bestScore) < 1e-9,
        s"trial $trial: solver ${sol.logProb} vs brute $bestScore ($inst)")
      assert(Scoring.completenessViolation(inst, sol.explanations).isEmpty, s"trial $trial incomplete")
      assert(math.abs(Scoring.logProb(inst, sol.explanations) - sol.logProb) < 1e-9,
        s"trial $trial: reported score differs from decoded score")
    }
  }
}
