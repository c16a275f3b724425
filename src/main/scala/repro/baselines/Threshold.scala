package repro.baselines

import repro.core.Model._

/** THRESHOLD baseline (Section 5.1.3): the evidence mapping is the set of
  * initial matches with probability ≥ the threshold (0.9 in the paper,
  * "THRESHOLD-0.9"); explanations follow via the shared decode.
  */
final case class Threshold(threshold: Double = 0.9) extends Algorithm {
  val name = s"THRESHOLD-$threshold"
  def derive(inst: Instance): ExplanationSet = {
    val ev = inst.matches.filter(_.p >= threshold).map(m => (m.left, m.right)).toSet
    EvidenceToExplanations.decode(inst, ev)
  }
}
