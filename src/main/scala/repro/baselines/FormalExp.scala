package repro.baselines

import repro.core.Model._

/** FORMALEXP baseline: best-effort adaptation of the single-dataset
  * explanation framework of Roy & Suciu (SIGMOD 2014) to the disjoint
  * setting, following the paper's protocol (Section 5.1.3): compare the two
  * query results, then ask on each dataset individually "why is the result
  * high (resp. low)?".
  *
  * Explanations are intervention predicates: removing the tuples covered by
  * a predicate changes the aggregate. Candidate predicates are
  * `attr = value` and `attr contains token` over the canonical attributes;
  * each is scored by how much its removal shrinks the gap between the two
  * results. The top-k predicates' covered tuples become provenance-based
  * explanations. No evidence mapping is produced — the method is
  * query-correspondence-agnostic, which is exactly why it underperforms.
  */
final case class FormalExp(k: Int = 15) extends Algorithm {
  val name = s"FORMALEXP-Top$k"

  /** Attribute view of a tuple; falls back to the matching-attribute key
    * when no provenance attributes were collected.
    */
  private def attrsOf(t: CTuple): Map[String, String] =
    if (t.attrs.nonEmpty) t.attrs else Map("key" -> t.key.mkString(" "))

  private final case class Pred(side: Int, attr: String, value: String, token: Boolean) {
    def covers(t: CTuple): Boolean = attrsOf(t).get(attr).exists { v =>
      if (token) v.toLowerCase.split("\\s+").contains(value) else v == value
    }
  }

  def derive(inst: Instance): ExplanationSet = {
    val agg1 = inst.t1.map(_.impact).sum
    val agg2 = inst.t2.map(_.impact).sum
    val gap = math.abs(agg1 - agg2)

    def candidates(ts: Vector[CTuple], side: Int): Seq[(Pred, Vector[CTuple])] = {
      val eq = ts.flatMap(t => attrsOf(t).toSeq.map { case (a, v) => Pred(side, a, v, token = false) })
      val tok = ts.flatMap(t => attrsOf(t).toSeq.flatMap { case (a, v) =>
        v.toLowerCase.split("\\s+").filter(_.nonEmpty).map(w => Pred(side, a, w, token = true))
      })
      (eq ++ tok).distinct.map(p => p -> ts.filter(p.covers))
    }

    val scored = (candidates(inst.t1, 1) ++ candidates(inst.t2, 2)).map { case (p, cov) =>
      val contrib = cov.map(_.impact).sum
      val newGap =
        if (p.side == 1) math.abs((agg1 - contrib) - agg2)
        else math.abs(agg1 - (agg2 - contrib))
      (p, cov, gap - newGap)
    }

    val top = scored
      .sortBy { case (p, cov, improvement) => (-improvement, cov.size, p.attr, p.value) }
      .take(k)
    val delta = top.iterator.flatMap(_._2).map(_.id).toSet
    ExplanationSet(delta, Map.empty, Set.empty)
  }
}
