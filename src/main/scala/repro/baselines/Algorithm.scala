package repro.baselines

import repro.core.Model._
import repro.core.ExplainSolver
import repro.partition.SmartPartition

/** Common interface for all evaluated algorithms (Section 5.1.3): each maps
  * an EXP-3D instance to an explanation set.
  */
trait Algorithm {
  def name: String
  def derive(inst: Instance): ExplanationSet
}

/** Shared decode used by RSWOOSH, THRESHOLD, GREEDY and EXACTCOVER
  * (Section 5.1.3): given a deterministic evidence mapping, tuples without a
  * match become provenance-based explanations and connected components with
  * unequal impact sums yield a value-based explanation. The changed tuple is
  * the component's largest-impact tuple on the hub side (deterministic; the
  * baselines' decode is underspecified in the paper).
  */
object EvidenceToExplanations {

  def decode(inst: Instance, evidence: Set[(Long, Long)]): ExplanationSet = {
    val matched = evidence.flatMap { case (l, r) => Seq(l, r) }
    val delta = inst.tupleById.keySet.diff(matched)

    val uf = new repro.core.Scoring.UnionFind(matched)
    evidence.foreach { case (l, r) => uf.union(l, r) }
    val hubSide = if (inst.phi == Phi.MoreGeneral) 1 else 2
    val values = matched.groupBy(uf.find).flatMap { case (_, comp) =>
      val ts = comp.toSeq.map(inst.tupleById)
      val lSum = ts.filter(_.side == 1).map(_.impact).sum
      val rSum = ts.filter(_.side == 2).map(_.impact).sum
      if (math.abs(lSum - rSum) > 1e-9) {
        val hubs = ts.filter(_.side == hubSide)
        val target = if (hubs.nonEmpty) hubs.maxBy(t => (math.abs(t.impact), t.id))
                     else ts.maxBy(t => (math.abs(t.impact), t.id))
        val newImpact = if (target.side == 2) lSum - (rSum - target.impact)
                        else rSum - (lSum - target.impact)
        Some(target.id -> ValueChange(target.id, target.impact, newImpact))
      } else None
    }
    ExplanationSet(delta, values, evidence)
  }
}

/** EXPLAIN3D without the smart-partitioning optimization (NOOPT). */
final case class Explain3DNoOpt(cfg: ExplainSolver.Config = ExplainSolver.Config())
    extends Algorithm {
  val name = "EXPLAIN3D-NOOPT"
  def derive(inst: Instance): ExplanationSet = ExplainSolver.solve(inst, cfg).explanations
}

/** EXPLAIN3D with smart partitioning at a fixed batch size (BATCH-<n>). */
final case class Explain3DBatch(
    batch: Int,
    cfg: ExplainSolver.Config = ExplainSolver.Config(),
    partCfg: repro.partition.PrePartition.Config = repro.partition.PrePartition.Config(),
) extends Algorithm {
  val name = s"EXPLAIN3D-BATCH-$batch"
  def derive(inst: Instance): ExplanationSet =
    SmartPartition.solve(inst, SmartPartition.Config(batch, partCfg), cfg).explanations
}
