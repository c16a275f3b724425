package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._
import repro.milp.BruteForceMilp

class MilpBuilderSpec extends AnyFunSuite {

  private val params = Params(0.9, 0.9)

  private def check(inst: Instance): Unit = {
    val built = MilpBuilder.build(inst)
    val milpSol = BruteForceMilp.solve(built.lp)
    val (bruteE, bruteScore) = SemanticBruteForce.solve(inst)
    assert(milpSol.isDefined, "MILP must be feasible (delete-everything always works)")
    val sol = milpSol.get
    val decoded = built.decode(sol.x)
    // The MILP objective (plus the constant offset) equals the EXP-3D score.
    assert(math.abs((sol.objective + built.objectiveOffset) - bruteScore) < 1e-6,
      s"milp ${sol.objective + built.objectiveOffset} vs brute $bruteScore\n$inst\nbrute=$bruteE\nmilp=$decoded")
    assert(Scoring.completenessViolation(inst, decoded).isEmpty,
      s"decoded MILP solution incomplete: $decoded")
    assert(math.abs(Scoring.logProb(inst, decoded) - bruteScore) < 1e-6)
  }

  test("single pair, equal impacts") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 1)), Vector(CTuple(10, 2, Seq("a"), 1)),
      Vector(TupleMatch(0, 10, 0.9)), Phi.Equiv, params))
  }

  test("single pair, unequal impacts (value-based explanation)") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 2)), Vector(CTuple(10, 2, Seq("a"), 1)),
      Vector(TupleMatch(0, 10, 0.9)), Phi.Equiv, params))
  }

  test("unmatched tuples on both sides") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 1), CTuple(1, 1, Seq("b"), 2)),
      Vector(CTuple(10, 2, Seq("a"), 1)),
      Vector(TupleMatch(0, 10, 0.9)), Phi.Equiv, params))
  }

  test("ambiguous match resolved optimally") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 1), CTuple(1, 1, Seq("b"), 1)),
      Vector(CTuple(10, 2, Seq("a"), 1), CTuple(11, 2, Seq("b"), 1)),
      Vector(TupleMatch(0, 10, 0.8), TupleMatch(1, 11, 0.8), TupleMatch(0, 11, 0.9)),
      Phi.Equiv, params))
  }

  test("many-to-one under ⊑") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 1), CTuple(1, 1, Seq("b"), 1)),
      Vector(CTuple(10, 2, Seq("g"), 2)),
      Vector(TupleMatch(0, 10, 0.9), TupleMatch(1, 10, 0.9)),
      Phi.LessGeneral, params))
  }

  test("low-probability match") {
    check(Instance(
      Vector(CTuple(0, 1, Seq("a"), 5)), Vector(CTuple(10, 2, Seq("z"), 1)),
      Vector(TupleMatch(0, 10, 0.05)), Phi.Equiv, params))
  }

  test("randomized tiny instances agree with the semantic brute force") {
    val rnd = new scala.util.Random(99)
    val probs = Array(0.2, 0.6, 0.9)
    for (trial <- 0 until 8) {
      val n1 = 1 + rnd.nextInt(2)
      val n2 = 1 + rnd.nextInt(2)
      val t1 = (0 until n1).map(i => CTuple(i, 1, Seq(s"l$i"), rnd.nextInt(3))).toVector
      val t2 = (0 until n2).map(i => CTuple(100 + i, 2, Seq(s"r$i"), rnd.nextInt(3))).toVector
      val ms = (for {
        i <- 0 until n1; j <- 0 until n2 if rnd.nextDouble() < 0.8
      } yield TupleMatch(i, 100 + j, probs(rnd.nextInt(probs.length)))).toVector
      val phi = Seq(Phi.Equiv, Phi.LessGeneral, Phi.MoreGeneral)(rnd.nextInt(3))
      check(Instance(t1, t2, ms, phi, params))
    }
  }
}
