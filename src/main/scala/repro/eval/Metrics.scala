package repro.eval

import repro.core.Model.ExplanationSet
import repro.eval.Gold.Item

/** Precision / recall / F-measure over explanations and evidence mappings
  * (Section 5.1.4).
  */
object Metrics {

  final case class PRF(precision: Double, recall: Double, f1: Double) {
    override def toString: String = f"P=$precision%.3f R=$recall%.3f F=$f1%.3f"
  }

  def prf[A](derived: Set[A], gold: Set[A]): PRF = {
    val tp = derived.intersect(gold).size.toDouble
    val p = if (derived.isEmpty) (if (gold.isEmpty) 1.0 else 0.0) else tp / derived.size
    val r = if (gold.isEmpty) 1.0 else tp / gold.size
    val f = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    PRF(p, r, f)
  }

  /** Translates a solver [[ExplanationSet]] into comparable (kind, side, key)
    * items via the tuple-id → (side, key) map of the prepared pair.
    */
  def explanationItems(e: ExplanationSet, keyOf: Map[Long, (Int, String)]): Set[Item] = {
    val prov = e.delta.map { id => val (s, k) = keyOf(id); ("prov", s, k) }
    val value = e.values.keySet.map { id => val (s, k) = keyOf(id); ("value", s, k) }
    prov ++ value
  }

  def evidenceItems(e: ExplanationSet, keyOf: Map[Long, (Int, String)]): Set[(String, String)] =
    e.evidence.map { case (l, r) => (keyOf(l)._2, keyOf(r)._2) }
}
