package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._
import repro.core.ScoringSpec

class BaselinesSpec extends AnyFunSuite {

  private val params = Params(0.9, 0.9)
  private def fig3 = new ScoringSpec().fig3

  test("THRESHOLD keeps only matches above the threshold") {
    val e = Threshold(0.92).derive(fig3)
    // fig3 has five 0.95 matches and one 0.9 (CS→CSE): the CS pair is lost.
    assert(e.evidence.size == 5)
    assert(e.delta.contains(1L) && e.delta.contains(11L))
  }

  test("THRESHOLD at 0.9 recovers all fig3 matches") {
    val e = Threshold(0.9).derive(fig3)
    assert(e.evidence.size == 6)
    assert(e.delta.isEmpty)
    assert(e.values.keySet == Set(11L), "CS=2 vs CSE=1 becomes a value explanation")
  }

  test("GREEDY falls into the local-maximum trap of Section 5.2") {
    val t1 = Vector(CTuple(0, 1, Seq("A"), 1), CTuple(1, 1, Seq("B"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("A'"), 1), CTuple(11, 2, Seq("B'"), 1))
    val ms = Vector(
      TupleMatch(0, 10, 0.8), TupleMatch(1, 11, 0.8),
      TupleMatch(0, 11, 0.9), TupleMatch(1, 10, 0.5))
    val inst = Instance(t1, t2, ms, Phi.Equiv, params)
    val e = Greedy.derive(inst)
    // Greedy grabs (A,B') first, then can only add (B,A').
    assert(e.evidence.contains((0L, 11L)))
    assert(e.evidence != Set((0L, 10L), (1L, 11L)), "greedy misses the global optimum")
  }

  test("GREEDY respects valid-mapping cardinality") {
    val e = Greedy.derive(fig3)
    assert(e.evidence.groupBy(_._1).values.forall(_.size <= 1))
    assert(e.evidence.groupBy(_._2).values.forall(_.size <= 1))
  }

  test("GREEDY solves fig3 exactly (no ambiguity there)") {
    val e = Greedy.derive(fig3)
    assert(e.evidence.size == 6)
    assert(e.values.keySet == Set(11L))
  }

  test("RSWOOSH merges identical names across sides") {
    val e = RSwoosh().derive(fig3)
    // accounting/ece/ee/management/design match exactly (Jaccard 1);
    // cs vs cse do not reach 0.75.
    assert(e.evidence.size == 5)
    assert(e.delta == Set(1L, 11L))
  }

  test("RSWOOSH transitive merge produces cluster cross-pairs") {
    val t1 = Vector(CTuple(0, 1, Seq("alpha beta"), 1), CTuple(1, 1, Seq("alpha beta gamma"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("alpha beta"), 1))
    val inst = Instance(t1, t2, Vector(TupleMatch(0, 10, 0.9)), Phi.LessGeneral, params)
    val e = RSwoosh(0.6).derive(inst)
    assert(e.evidence == Set((0L, 10L), (1L, 10L)))
  }

  test("EXACTCOVER ignores probabilities and impacts") {
    val e = ExactCover.derive(fig3)
    // Every T2 tuple covers exactly one element here, so all get selected.
    assert(e.evidence.size == 6)
  }

  test("EXACTCOVER enforces each element covered at most once") {
    val t1 = Vector(CTuple(0, 1, Seq("x"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("x"), 1), CTuple(11, 2, Seq("x2"), 2))
    val ms = Vector(TupleMatch(0, 10, 0.9), TupleMatch(0, 11, 0.4))
    val e = ExactCover.derive(Instance(t1, t2, ms, Phi.Equiv, params))
    assert(e.evidence.size == 1)
  }

  test("FORMALEXP produces provenance-only explanations and no evidence") {
    val e = FormalExp(15).derive(fig3)
    assert(e.evidence.isEmpty)
    assert(e.values.isEmpty)
    assert(e.delta.nonEmpty)
  }

  test("FORMALEXP top-k favours predicates shrinking the result gap") {
    // Side 1 has 3 extra "extra studies" tuples inflating its result.
    val t1 = Vector(
      CTuple(0, 1, Seq("math"), 1), CTuple(1, 1, Seq("extra studies a"), 1),
      CTuple(2, 1, Seq("extra studies b"), 1), CTuple(3, 1, Seq("extra studies c"), 1))
    val t2 = Vector(CTuple(10, 2, Seq("math"), 1))
    val inst = Instance(t1, t2, Vector(TupleMatch(0, 10, 0.9)), Phi.Equiv, params)
    val e = FormalExp(1).derive(inst)
    assert(e.delta == Set(1L, 2L, 3L), "the 'extra' token predicate covers the gap exactly")
  }

  test("evidence decode marks unmatched tuples and unbalanced components") {
    val inst = fig3
    val e = EvidenceToExplanations.decode(inst, Set((1L, 11L)))
    assert(e.delta == inst.tupleById.keySet -- Set(1L, 11L))
    assert(e.values.keySet == Set(11L))
    assert(e.values(11L).newImpact == 2.0)
  }

  test("Explain3DNoOpt and Explain3DBatch wrap the solvers") {
    val a = Explain3DNoOpt()
    val b = Explain3DBatch(4)
    val ea = a.derive(fig3)
    val eb = b.derive(fig3)
    assert(ea.evidence.size == 6)
    assert(eb.evidence.nonEmpty)
  }
}
