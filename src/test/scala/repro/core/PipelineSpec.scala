package repro.core

import repro.SparkSpec
import repro.baselines._
import repro.core.Model.Phi
import repro.core.Similarity.KeyAttr
import repro.data.SyntheticGen
import repro.eval.{Harness, Metrics}

/** End-to-end pipeline tests on the §5.3 synthetic generator: stage 1 in
  * Spark, stage 2 in the solver, metrics against the derived gold standard.
  */
class PipelineSpec extends SparkSpec {

  private lazy val prepared = {
    val cfg = SyntheticGen.Config(n = 150, d = 0.2, v = 60, seed = 7)
    Pipeline.prepare(
      SyntheticGen.canonicalSide(spark, cfg, 1),
      SyntheticGen.canonicalSide(spark, cfg, 2),
      Seq(KeyAttr("match_attr")),
      Phi.Equiv)
  }

  test("prepared instance has plausible sizes") {
    val s = prepared.stats
    assert(s.t1 > 110 && s.t1 <= 150)
    assert(s.t2 > 110 && s.t2 <= 150)
    assert(s.nMatches >= s.t1.min(s.t2), "at least the true pairs must be candidates")
  }

  test("true matches receive high calibrated probabilities") {
    // A surviving pair shares its exact phrase → sim 1.0 → top bucket.
    val truePairs = prepared.gold.evidence
    val got = prepared.inst.matches
      .filter(m => truePairs.contains((prepared.keyOf(m.left)._2, prepared.keyOf(m.right)._2)))
    assert(got.nonEmpty)
    assert(got.forall(_.p > 0.8), s"min true p = ${got.map(_.p).min}")
  }

  test("EXPLAIN3D achieves near-perfect accuracy on synthetic data") {
    val res = Harness.run(Explain3DNoOpt(), prepared, "synthetic")
    assert(res.explanation.f1 > 0.9, s"explanation F1 = ${res.explanation}")
    assert(res.evidence.f1 > 0.9, s"evidence F1 = ${res.evidence}")
  }

  test("BATCH partitioned solve loses little to no accuracy") {
    val res = Harness.run(Explain3DBatch(50), prepared, "synthetic")
    assert(res.explanation.f1 > 0.85, s"explanation F1 = ${res.explanation}")
    assert(res.evidence.f1 > 0.85, s"evidence F1 = ${res.evidence}")
  }

  test("EXPLAIN3D beats THRESHOLD and EXACTCOVER on explanations") {
    val e3d = Harness.run(Explain3DNoOpt(), prepared, "s").explanation.f1
    val thr = Harness.run(Threshold(0.9), prepared, "s").explanation.f1
    val exc = Harness.run(ExactCover, prepared, "s").explanation.f1
    assert(e3d >= thr, s"e3d=$e3d thr=$thr")
    assert(e3d > exc, s"e3d=$e3d exactcover=$exc")
  }

  test("solver score equals scored decode on the prepared instance") {
    val sol = ExplainSolver.solve(prepared.inst)
    assert(Scoring.completenessViolation(prepared.inst, sol.explanations).isEmpty)
    assert(math.abs(Scoring.logProb(prepared.inst, sol.explanations) - sol.logProb) < 1e-6)
  }

  test("keyOf covers every tuple and evidence endpoints") {
    val ids = prepared.inst.tupleById.keySet
    assert(prepared.keyOf.keySet == ids)
  }

  test("all algorithms run end-to-end without error") {
    val algos = Seq(Explain3DNoOpt(), Explain3DBatch(40), Threshold(0.9), Greedy,
      RSwoosh(), ExactCover, FormalExp(15))
    val rows = algos.map(a => Harness.run(a, prepared, "synthetic"))
    assert(rows.map(_.algorithm).distinct.size == algos.size)
  }
}
