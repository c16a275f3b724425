package repro.baselines

import repro.core.Model._
import scala.collection.mutable

/** RSWOOSH baseline: the R-Swoosh entity-resolution algorithm (Benjelloun
  * et al., "Swoosh: a generic approach to entity resolution", VLDB J. 2009)
  * applied across the two canonical relations.
  *
  * Records are the canonical tuples viewed as token sets over their matching
  * attributes; the match function is token Jaccard ≥ `threshold` (0.75 in
  * the paper's setup); the merge function unions token sets and member ids.
  * The algorithm maintains a resolved set I′ and repeatedly pulls a record
  * from the input: if it matches some r′ ∈ I′, both are merged and the merge
  * re-enters the input, otherwise the record is added to I′. Deterministic
  * matches: the evidence mapping is every cross-side pair inside a final
  * merged record, all with probability 1.0 (treated as the evidence, per
  * Section 5.1.3).
  */
final case class RSwoosh(threshold: Double = 0.75) extends Algorithm {
  val name = s"RSWOOSH-$threshold"

  private final case class Rec(tokens: Set[String], left: Set[Long], right: Set[Long])

  private def jaccard(a: Set[String], b: Set[String]): Double = {
    if (a.isEmpty && b.isEmpty) 0.0
    else a.intersect(b).size.toDouble / a.union(b).size.toDouble
  }

  def derive(inst: Instance): ExplanationSet = {
    def rec(t: CTuple): Rec = {
      val toks = t.key.iterator.flatMap(_.toLowerCase.split("\\s+")).filter(_.nonEmpty).toSet
      if (t.side == 1) Rec(toks, Set(t.id), Set.empty) else Rec(toks, Set.empty, Set(t.id))
    }
    val input = mutable.Queue.from((inst.t1 ++ inst.t2).sortBy(_.id).map(rec))
    val resolved = mutable.ArrayBuffer.empty[Rec]
    while (input.nonEmpty) {
      val r = input.dequeue()
      val matchIdx = resolved.indexWhere(r2 => jaccard(r.tokens, r2.tokens) >= threshold)
      if (matchIdx >= 0) {
        val r2 = resolved.remove(matchIdx)
        input.enqueue(Rec(r.tokens ++ r2.tokens, r.left ++ r2.left, r.right ++ r2.right))
      } else resolved += r
    }
    val ev = resolved.iterator.flatMap(r => for (l <- r.left; rr <- r.right) yield (l, rr)).toSet
    EvidenceToExplanations.decode(inst, ev)
  }
}
