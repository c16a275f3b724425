package repro.eval

import repro.baselines.Algorithm
import repro.core.Pipeline.PreparedPair
import repro.eval.Metrics.PRF

/** End-to-end evaluation harness: runs an algorithm on a prepared pair and
  * scores explanations and evidence against the gold standard
  * (Section 5.1.4 metrics). Timing is the algorithm's solve time; the shared
  * match-generation time (98% of total for the mapping-based methods, per
  * the paper) is measured once per pair during preparation.
  */
object Harness {

  final case class AlgoResult(
      algorithm: String,
      pair: String,
      explanation: PRF,
      evidence: PRF,
      solveMillis: Long,
  ) {
    def row: String =
      f"$pair%-12s $algorithm%-22s  expl[$explanation]  evid[$evidence]  ${solveMillis}ms"
  }

  def run(algo: Algorithm, pair: PreparedPair, pairName: String): AlgoResult = {
    val t0 = System.nanoTime()
    val e = algo.derive(pair.inst)
    val ms = (System.nanoTime() - t0) / 1000000
    val expl = Metrics.prf(Metrics.explanationItems(e, pair.keyOf), pair.gold.explanations)
    val evid = Metrics.prf(Metrics.evidenceItems(e, pair.keyOf), pair.gold.evidence)
    AlgoResult(algo.name, pairName, expl, evid, ms)
  }

  /** Arithmetic mean of results across pairs (used for the IMDb templates,
    * which the paper averages over 10 instantiations).
    */
  def average(name: String, rs: Seq[AlgoResult]): AlgoResult = {
    def avgPrf(f: AlgoResult => PRF): PRF = PRF(
      rs.map(f(_).precision).sum / rs.size,
      rs.map(f(_).recall).sum / rs.size,
      rs.map(f(_).f1).sum / rs.size,
    )
    AlgoResult(rs.head.algorithm, name, avgPrf(_.explanation), avgPrf(_.evidence),
      rs.map(_.solveMillis).sum / rs.size)
  }
}
