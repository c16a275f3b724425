package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Figure 6: explanation accuracy, evidence accuracy and runtime of all
  * algorithms on the two Academic pairs.
  *
  * Paper shape (read off Figures 6a–6f):
  *  - EXPLAIN3D: highest F on both pairs (explanations ≈ 0.85–0.95,
  *    evidence ≈ 0.9);
  *  - THRESHOLD-0.9 / RSWOOSH: high evidence precision (≈1.0) but low
  *    recall (≈0.4–0.6) → low explanation precision;
  *  - GREEDY: middling (local maxima), better recall than THRESHOLD;
  *  - FORMALEXP-Top15 and EXACTCOVER: lowest F;
  *  - runtimes all sub-second, dominated (>98%) by match generation.
  */
class Fig6AcademicBench extends SparkSpec {

  test("Figure 6: Academic pairs, all algorithms") {
    val runs = Experiments.academic(spark)
    runs.foreach(r => println(Experiments.render(r) + "\n"))

    for (r <- runs) {
      val byName = r.results.map(x => x.algorithm -> x).toMap
      val e3d = byName.keys.find(_.startsWith("EXPLAIN3D-NOOPT")).map(byName).get
      // EXPLAIN3D beats every baseline on explanation F (the paper's
      // headline). GREEDY shares the objective and can land within noise on
      // the cleaner pair, so it gets a small tie tolerance.
      for ((nm, res) <- byName if !nm.startsWith("EXPLAIN3D")) {
        val tol = if (nm == "GREEDY") 0.02 else 1e-9
        assert(e3d.explanation.f1 >= res.explanation.f1 - tol,
          s"${r.pairName}: EXPLAIN3D (${e3d.explanation.f1}) must beat $nm (${res.explanation.f1})")
      }
      // Threshold keeps only high-p matches: high evidence precision, lower recall.
      val thr = byName("THRESHOLD-0.9")
      assert(thr.evidence.precision >= 0.9, s"${r.pairName}: THRESHOLD precision ${thr.evidence}")
      assert(thr.evidence.recall < e3d.evidence.recall,
        s"${r.pairName}: THRESHOLD recall must trail EXPLAIN3D")
      // FormalExp produces no evidence mapping at all.
      val fe = byName("FORMALEXP-Top15")
      assert(fe.evidence.recall == 0.0 || fe.evidence.precision == 0.0)
      // EXPLAIN3D reaches good absolute accuracy.
      assert(e3d.explanation.f1 >= 0.7, s"${r.pairName}: explanation F ${e3d.explanation}")
      assert(e3d.evidence.f1 >= 0.8, s"${r.pairName}: evidence F ${e3d.evidence}")
    }
  }
}
