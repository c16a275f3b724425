package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._

class ModelSpec extends AnyFunSuite {

  test("Phi cardinality caps per Definition 3.2") {
    assert(Phi.Equiv.capsLeft && Phi.Equiv.capsRight)
    assert(Phi.LessGeneral.capsLeft && !Phi.LessGeneral.capsRight)
    assert(!Phi.MoreGeneral.capsLeft && Phi.MoreGeneral.capsRight)
  }

  test("CTuple rejects invalid sides") {
    assertThrows[IllegalArgumentException](CTuple(0, 3, Seq("x"), 1.0))
    assertThrows[IllegalArgumentException](CTuple(0, 0, Seq("x"), 1.0))
  }

  test("TupleMatch rejects degenerate probabilities") {
    assertThrows[IllegalArgumentException](TupleMatch(0, 1, 0.0))
    assertThrows[IllegalArgumentException](TupleMatch(0, 1, 1.0))
    assertThrows[IllegalArgumentException](TupleMatch(0, 1, -0.2))
  }

  test("Params requires α, β in (0.5, 1) per Section 3.1") {
    assertThrows[IllegalArgumentException](Params(0.5, 0.9))
    assertThrows[IllegalArgumentException](Params(0.9, 1.0))
    val p = Params(0.7, 0.8)
    assert(p.costKeep > p.costChange)
  }

  test("Instance rejects duplicate ids and mis-assigned sides") {
    val a = CTuple(0, 1, Seq("a"), 1)
    val b = CTuple(0, 2, Seq("b"), 1)
    assertThrows[IllegalArgumentException](
      Instance(Vector(a), Vector(b), Vector.empty, Phi.Equiv))
    assertThrows[IllegalArgumentException](
      Instance(Vector(CTuple(1, 2, Seq("x"), 1)), Vector.empty, Vector.empty, Phi.Equiv))
  }

  test("ExplanationSet exposes explanation tuple ids") {
    val e = ExplanationSet(Set(1L), Map(2L -> ValueChange(2, 1, 3)), Set.empty)
    assert(e.explanationTupleIds == Set(1L, 2L))
  }

  test("Solution carries provedness") {
    val s = Solution(ExplanationSet(Set.empty, Map.empty, Set.empty), -1.0, proved = false)
    assert(!s.proved)
  }
}
