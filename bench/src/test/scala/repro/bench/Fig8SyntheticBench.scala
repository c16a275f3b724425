package repro.bench

import repro.SparkSpec
import repro.core.ExplainSolver
import repro.data.SyntheticGen
import repro.eval.Experiments

/** Figure 8: solve-time of NOOPT vs BATCH-100 vs BATCH-1000 over the
  * synthetic generator sweeps (match-generation time excluded, as in the
  * paper).
  *
  * Paper shape: (a) NOOPT grows super-linearly with n while BATCH grows
  * linearly (BATCH-1000 >20× faster at the top of the sweep; BATCH-1000
  * beats BATCH-100 except at small vocabularies); (b) lower difference
  * ratios d are harder for everyone; (c) small vocabularies blow up the
  * number of matches — BATCH-100 wins there (15× over NOOPT at v=100),
  * converging as v grows. Accuracy stays near-perfect for all three. Our
  * sweep caps n at 5000 (driver-collected matches; DESIGN.md).
  */
class Fig8SyntheticBench extends SparkSpec {

  private val solverCfg = ExplainSolver.Config(timeLimitMs = 90000)
  private val batches = Seq(100, 1000)

  test("Figure 8a: sweep n (d=0.2, v=1000)") {
    val points = Seq(100, 300, 1000, 5000).flatMap { n =>
      Experiments.syntheticPoint(spark, SyntheticGen.Config(n = n), batches, solverCfg)
    }
    println(Experiments.renderSynthetic(points))
    // Partitioning (BATCH-100) must beat the unpartitioned solve at the top
    // of the sweep — the paper's headline claim. (Our B&B has no per-MILP
    // setup cost, so unlike the paper's CPLEX, BATCH-100 is the fastest
    // batch size throughout; see EXPERIMENTS.md.)
    val at5000 = points.filter(_.n == 5000)
    val noopt = at5000.find(_.algorithm == "NOOPT").get
    val b100 = at5000.find(_.algorithm == "BATCH-100").get
    assert(b100.solveMillis < noopt.solveMillis,
      s"partitioning must be faster at n=5000: ${b100.solveMillis} vs ${noopt.solveMillis}")
    points.filter(_.algorithm == "BATCH-100").foreach { p =>
      assert(p.explF1 > 0.9 && p.evidF1 > 0.9, s"near-perfect accuracy expected: $p")
    }
  }

  test("Figure 8b: sweep d (n=1000, v=1000)") {
    val points = Seq(0.1, 0.3, 0.5).flatMap { d =>
      Experiments.syntheticPoint(spark, SyntheticGen.Config(n = 1000, d = d), batches, solverCfg)
    }
    println(Experiments.renderSynthetic(points))
    points.foreach(p => assert(p.explF1 > 0.85 && p.evidF1 > 0.85, s"accuracy: $p"))
  }

  test("Figure 8c: sweep v (n=1000, d=0.2)") {
    val points = Seq(100, 1000, 10000).flatMap { v =>
      Experiments.syntheticPoint(spark, SyntheticGen.Config(n = 1000, v = v), batches, solverCfg)
    }
    println(Experiments.renderSynthetic(points))
    // At v=100 the candidate-match count explodes; partitioning must help.
    val at100 = points.filter(_.v == 100)
    val noopt = at100.find(_.algorithm == "NOOPT").get
    val b100 = at100.find(_.algorithm == "BATCH-100").get
    assert(b100.solveMillis <= noopt.solveMillis,
      s"BATCH-100 must not be slower at v=100: ${b100.solveMillis} vs ${noopt.solveMillis}")
  }
}
