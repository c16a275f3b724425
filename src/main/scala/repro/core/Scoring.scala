package repro.core

import repro.core.Model._

/** The objective function of Problem 1 in closed form (Eqs. 1–6), plus the
  * completeness checker (Def. 3.4: valid mapping + impact equality).
  *
  * Note on the paper's Eq. (8): it swaps the b/c constants — a tuple that
  * keeps its original impact (t ∉ δ) has probability αβ per Eq. (3), and a
  * tuple with a changed impact has α(1−β). We implement Eq. (3) directly.
  */
object Scoring {

  /** log Pr(E | T1, T2, M) up to the constant of proportionality of Eq. (1).
    * Requires `e` to be complete (Pr(E) = 1 prior); callers check with
    * [[completenessViolation]] first — an incomplete E has Pr(E) = 0, i.e.
    * −∞ in log space.
    */
  def logProb(inst: Instance, e: ExplanationSet): Double = {
    var s = 0.0
    val p = inst.params
    for (t <- inst.t1.iterator ++ inst.t2.iterator) {
      s += (if (e.delta.contains(t.id)) p.costDelete
            else if (e.values.contains(t.id)) p.costChange
            else p.costKeep)
    }
    for (m <- inst.matches) {
      s += (if (e.evidence.contains((m.left, m.right))) math.log(m.p)
            else math.log(1 - m.p))
    }
    s
  }

  /** Checks Def. 3.4. Returns None when `e` is complete, otherwise a
    * human-readable description of the first violation found.
    */
  def completenessViolation(inst: Instance, e: ExplanationSet): Option[String] = {
    val matchPairs = inst.matches.map(m => (m.left, m.right)).toSet
    val ids = inst.tupleById.keySet

    // Structural sanity: evidence drawn from M, ids exist, Δ ∩ δ = ∅ (Eq. 3:
    // Pr(t | t ∈ Δ, t ∈ δ) = 0), value changes actually change something.
    e.evidence.find(pr => !matchPairs.contains(pr)).foreach { pr =>
      return Some(s"evidence pair $pr not in the initial mapping")
    }
    (e.delta ++ e.values.keySet).find(!ids.contains(_)).foreach { id =>
      return Some(s"explanation references unknown tuple $id")
    }
    e.delta.intersect(e.values.keySet).headOption.foreach { id =>
      return Some(s"tuple $id is both deleted and value-changed")
    }
    e.values.find { case (id, vc) =>
      vc.tupleId != id || vc.newImpact == vc.oldImpact ||
        vc.oldImpact != inst.tupleById(id).impact
    }.foreach { case (id, _) => return Some(s"inconsistent value change for tuple $id") }

    // Deleted tuples cannot participate in the evidence mapping (z ≤ 1 − x).
    e.evidence.find { case (l, r) => e.delta.contains(l) || e.delta.contains(r) }
      .foreach { pr => return Some(s"evidence pair $pr touches a deleted tuple") }

    // Valid mapping (Def. 3.2): degree caps implied by φ.
    if (inst.phi.capsLeft) {
      val d = e.evidence.groupBy(_._1).collectFirst { case (l, ps) if ps.size > 1 => l }
      d.foreach(l => return Some(s"T1 tuple $l has degree > 1 under ${inst.phi}"))
    }
    if (inst.phi.capsRight) {
      val d = e.evidence.groupBy(_._2).collectFirst { case (r, ps) if ps.size > 1 => r }
      d.foreach(r => return Some(s"T2 tuple $r has degree > 1 under ${inst.phi}"))
    }

    // Impact equality (Def. 3.3) over connected components of the refined
    // canonical relations under the evidence mapping. Kept tuples outside any
    // evidence pair form singleton components: their side sums must be 0.
    def refined(id: Long): Double =
      e.values.get(id).map(_.newImpact).getOrElse(inst.tupleById(id).impact)

    val kept = ids -- e.delta
    val uf = new UnionFind(kept)
    e.evidence.foreach { case (l, r) => uf.union(l, r) }
    val bySide = kept.groupBy(uf.find)
    for ((_, comp) <- bySide) {
      val leftSum  = comp.iterator.filter(inst.tupleById(_).side == 1).map(refined).sum
      val rightSum = comp.iterator.filter(inst.tupleById(_).side == 2).map(refined).sum
      if (math.abs(leftSum - rightSum) > 1e-6)
        return Some(s"impact inequality in component ${comp.toSeq.sorted}: $leftSum vs $rightSum")
    }
    None
  }

  /** Scores an explanation set, returning −∞ when incomplete. */
  def scoreOrNegInf(inst: Instance, e: ExplanationSet): Double =
    completenessViolation(inst, e) match {
      case None    => logProb(inst, e)
      case Some(_) => Double.NegativeInfinity
    }

  /** Minimal union-find over tuple ids, used for component extraction. */
  final class UnionFind(ids: Iterable[Long]) {
    private val parent = scala.collection.mutable.Map.empty[Long, Long]
    ids.foreach(id => parent(id) = id)
    def find(x: Long): Long = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != r) { val n = parent(c); parent(c) = r; c = n }
      r
    }
    def union(a: Long, b: Long): Unit = {
      val ra = find(a); val rb = find(b)
      if (ra != rb) parent(ra) = rb
    }
  }
}
