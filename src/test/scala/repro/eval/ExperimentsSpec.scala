package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Pipeline.PairStats
import repro.eval.Metrics.PRF

class ExperimentsSpec extends AnyFunSuite {

  test("roster contains the paper's algorithm lineup") {
    val names = Experiments.Roster().algorithms.map(_.name)
    assert(names.contains("FORMALEXP-Top15"))
    assert(names.contains("RSWOOSH-0.75"))
    assert(names.contains("THRESHOLD-0.9"))
    assert(names.contains("GREEDY"))
    assert(names.contains("EXACTCOVER"))
    assert(names.contains("EXPLAIN3D-BATCH-100"))
    assert(names.contains("EXPLAIN3D-NOOPT"))
  }

  test("render includes stats header, result rows and DNF markers") {
    val run = Experiments.PairRun(
      "pair", 123, PairStats(10, 12, 30),
      Seq(Harness.AlgoResult("ALGO", "pair", PRF(1, 1, 1), PRF(0.5, 0.5, 0.5), 7)),
      Seq("RSWOOSH-0.75"))
    val s = Experiments.render(run)
    assert(s.contains("|T1|=10"))
    assert(s.contains("|M_tuple|=30"))
    assert(s.contains("ALGO"))
    assert(s.contains("DNF"))
  }

  test("renderSynthetic formats one line per point") {
    val pts = Seq(
      Experiments.SyntheticPoint(100, 0.2, 1000, "NOOPT", 12, 1.0, 1.0, proved = true),
      Experiments.SyntheticPoint(100, 0.2, 1000, "BATCH-100", 5, 0.99, 1.0, proved = true))
    val s = Experiments.renderSynthetic(pts)
    assert(s.linesIterator.size == 2)
    assert(s.contains("NOOPT") && s.contains("BATCH-100"))
  }

  test("AlgoResult row is aligned and complete") {
    val r = Harness.AlgoResult("X", "p", PRF(0.123456, 0.5, 0.2), PRF(1, 1, 1), 42)
    assert(r.row.contains("P=0.123"))
    assert(r.row.contains("42ms"))
  }
}
