package repro.core

import repro.core.Model._
import repro.milp.LinearProgram

/** Translation of an EXP-3D instance into the paper's MILP (Section 3.2,
  * Eqs. 7–13), with the corrections listed in DESIGN.md:
  *
  *  - per-tuple objective uses Eq. (3) directly (the paper's Eq. (8) swaps
  *    the keep/change constants);
  *  - the impact-equality constraint of a component is deactivated when the
  *    component's hub tuple is deleted (a deleted tuple cannot also be a
  *    value-based explanation);
  *  - an unselected match contributes log(1−p) regardless of endpoint
  *    deletion, consistent with `z ≤ 1 − x`.
  *
  * Orientation: the side whose degree is capped by φ provides the "leaf"
  * tuples; the other side's tuples are star "hubs" whose refined impact must
  * equal the sum of their selected leaves' refined impacts. For ≡ both sides
  * are capped and components degenerate to single edges.
  *
  * The builder returns the program, the constant objective offset (the MILP
  * objective plus this offset equals log Pr(E | T, M)), and a decoder from a
  * variable assignment back to an [[Model.ExplanationSet]].
  */
object MilpBuilder {

  final case class BuiltMilp(
      lp: LinearProgram,
      objectiveOffset: Double,
      decode: IndexedSeq[Double] => ExplanationSet,
  )

  def build(inst: Instance): BuiltMilp = {
    val lp = new LinearProgram
    val p  = inst.params
    val all = inst.t1 ++ inst.t2
    val bigM = all.iterator.map(t => math.abs(t.impact)).sum + all.map(t => math.abs(t.impact)).maxOption.getOrElse(0.0) + 1.0
    val (lB, uB) = (p.costChange, p.costKeep) // c ≤ inner ≤ b (both negative)

    // Per-tuple variables: x (deleted), y (impact unchanged), I* (refined
    // impact), P (linearized (1−x)(y·b + (1−y)·c)).
    val x = all.map(t => lp.addVar(s"x_${t.id}", 0, 1, isInt = true, obj = p.costDelete)).toArray
    val y = all.map(t => lp.addVar(s"y_${t.id}", 0, 1, isInt = true)).toArray
    val iStar = all.map(t => lp.addVar(s"I_${t.id}", -bigM, bigM)).toArray
    val pVar = all.map(t => lp.addVar(s"P_${t.id}", lB min 0.0, uB max 0.0, obj = 1.0)).toArray
    val idxOf = all.iterator.map(_.id).zipWithIndex.toMap

    for ((t, i) <- all.zipWithIndex) {
      // Eq. (7): y = 1 forces I* = I (objective makes y=1 optimal iff I*=I).
      lp.le(iStar(i) -> 1.0, y(i) -> bigM)(t.impact + bigM, s"yLink+_${t.id}")
      lp.ge(iStar(i) -> 1.0, y(i) -> -bigM)(t.impact - bigM, s"yLink-_${t.id}")
      // Eq. (8) linearization of P = (1−x)·inner, inner = c + y(b−c).
      val bMinusC = uB - lB
      lp.ge(pVar(i) -> 1.0, x(i) -> lB)(lB, s"Plb_${t.id}")
      lp.le(pVar(i) -> 1.0, x(i) -> uB)(uB, s"Pub_${t.id}")
      lp.ge(pVar(i) -> 1.0, y(i) -> -bMinusC, x(i) -> uB)(lB, s"Pinner-_${t.id}")
      lp.le(pVar(i) -> 1.0, y(i) -> -bMinusC, x(i) -> lB)(lB, s"Pinner+_${t.id}")
    }

    // Per-match variables (Eq. 9) and degree caps (Eq. 10).
    var offset = 0.0
    val z = inst.matches.map { m =>
      val gain = math.log(m.p) - math.log(1 - m.p)
      offset += math.log(1 - m.p)
      val zi = lp.addVar(s"z_${m.left}_${m.right}", 0, 1, isInt = true, obj = gain)
      lp.le(zi -> 1.0, x(idxOf(m.left)) -> 1.0)(1.0, s"zx1_${m.left}_${m.right}")
      lp.le(zi -> 1.0, x(idxOf(m.right)) -> 1.0)(1.0, s"zx2_${m.left}_${m.right}")
      zi
    }.toArray
    if (inst.phi.capsLeft) {
      inst.matches.zipWithIndex.groupBy(_._1.left).foreach { case (l, es) =>
        if (es.size > 1) lp.addConstraint(es.map(e => z(e._2) -> 1.0).toMap, lp.Le, 1.0, s"degL_$l")
      }
    }
    if (inst.phi.capsRight) {
      inst.matches.zipWithIndex.groupBy(_._1.right).foreach { case (r, es) =>
        if (es.size > 1) lp.addConstraint(es.map(e => z(e._2) -> 1.0).toMap, lp.Le, 1.0, s"degR_$r")
      }
    }

    // Impact equality (Eqs. 11–12). Hubs are on the side NOT capped (for ≡,
    // arbitrarily T2). Each candidate edge e at hub h gets Ihat_e = z_e · I*_leaf.
    val hubSide = if (inst.phi == Phi.MoreGeneral) 1 else 2
    val hubEdges: Map[Long, Seq[Int]] = inst.matches.zipWithIndex
      .groupBy(m => if (hubSide == 1) m._1.left else m._1.right)
      .view.mapValues(_.map(_._2).toSeq).toMap

    val iHat = inst.matches.indices.map { ei =>
      val m = inst.matches(ei)
      val leaf = idxOf(if (hubSide == 1) m.right else m.left)
      val h = lp.addVar(s"Ihat_${m.left}_${m.right}", -bigM, bigM)
      lp.le(h -> 1.0, z(ei) -> -bigM)(0.0, s"IhatU_$ei")
      lp.ge(h -> 1.0, z(ei) -> bigM)(0.0, s"IhatL_$ei")
      lp.le(h -> 1.0, iStar(leaf) -> -1.0, z(ei) -> bigM)(bigM, s"IhatLink+_$ei")
      lp.ge(h -> 1.0, iStar(leaf) -> -1.0, z(ei) -> -bigM)(-bigM, s"IhatLink-_$ei")
      h
    }.toArray

    for (t <- all if t.side == hubSide) {
      val hi = idxOf(t.id)
      val es = hubEdges.getOrElse(t.id, Seq.empty)
      // |Σ Ihat − I*_hub| ≤ M·x_hub : active only while the hub is kept.
      val base = es.map(e => iHat(e) -> 1.0) :+ (iStar(hi) -> -1.0)
      lp.addConstraint((base :+ (x(hi) -> -bigM)).toMap, lp.Le, 0.0, s"eq+_${t.id}")
      lp.addConstraint((base :+ (x(hi) -> bigM)).toMap, lp.Ge, 0.0, s"eq-_${t.id}")
    }
    // Kept-but-unmatched leaf tuples must refine their impact to 0 (singleton
    // component impact equality).
    for (t <- all if t.side != hubSide) {
      val li = idxOf(t.id)
      val es = inst.matches.zipWithIndex.filter(m =>
        (if (hubSide == 1) m._1.right else m._1.left) == t.id).map(_._2)
      val sel = es.map(e => z(e) -> bigM) :+ (x(li) -> bigM)
      lp.addConstraint((sel :+ (iStar(li) -> -1.0)).toMap, lp.Ge, 0.0, s"zero+_${t.id}")
      lp.addConstraint((sel :+ (iStar(li) -> 1.0)).toMap, lp.Ge, 0.0, s"zero-_${t.id}")
    }

    def decode(sol: IndexedSeq[Double]): ExplanationSet = {
      val delta = all.zipWithIndex.collect { case (t, i) if sol(x(i)) > 0.5 => t.id }.toSet
      val values = all.zipWithIndex.flatMap { case (t, i) =>
        val ni = sol(iStar(i))
        if (sol(x(i)) < 0.5 && math.abs(ni - t.impact) > 1e-6)
          Some(t.id -> ValueChange(t.id, t.impact, ni))
        else None
      }.toMap
      val ev = inst.matches.zipWithIndex.collect {
        case (m, ei) if sol(z(ei)) > 0.5 => (m.left, m.right)
      }.toSet
      ExplanationSet(delta, values, ev)
    }

    BuiltMilp(lp, offset, decode)
  }
}
