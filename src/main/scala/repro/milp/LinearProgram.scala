package repro.milp

import scala.collection.mutable.ArrayBuffer

/** A small mixed-integer linear program model.
  *
  * The paper solves stage 2 with IBM CPLEX; no MILP solver ships in this
  * offline environment, so we build the substrate ourselves. This model class
  * is the shared representation: [[Simplex]] solves its continuous relaxation,
  * [[BruteForceMilp]] solves small mixed instances exactly (the test oracle
  * for the production solver in `repro.core.ExplainSolver`).
  *
  * Conventions: maximize `obj · x`; every variable has finite bounds
  * (sufficient for the paper's formulation, where big-M constants bound all
  * impacts); constraints are `Σ aᵢxᵢ (≤ | = | ≥) rhs`.
  */
final class LinearProgram {

  /** A decision variable. `isInt` marks integrality (binaries use [0,1]). */
  final case class Variable(name: String, lb: Double, ub: Double, isInt: Boolean, obj: Double)

  sealed trait Sense
  case object Le extends Sense
  case object Eq extends Sense
  case object Ge extends Sense

  final case class Constraint(coeffs: Map[Int, Double], sense: Sense, rhs: Double, name: String)

  val variables: ArrayBuffer[Variable]    = ArrayBuffer.empty
  val constraints: ArrayBuffer[Constraint] = ArrayBuffer.empty

  /** Adds a variable; returns its index. */
  def addVar(name: String, lb: Double, ub: Double, isInt: Boolean = false, obj: Double = 0.0): Int = {
    require(lb.isFinite && ub.isFinite && lb <= ub, s"bad bounds for $name: [$lb, $ub]")
    variables += Variable(name, lb, ub, isInt, obj)
    variables.size - 1
  }

  def addConstraint(coeffs: Map[Int, Double], sense: Sense, rhs: Double, name: String = ""): Unit = {
    require(coeffs.keys.forall(i => i >= 0 && i < variables.size), s"unknown variable in $name")
    constraints += Constraint(coeffs, sense, rhs, name)
  }

  def le(coeffs: (Int, Double)*)(rhs: Double, name: String = ""): Unit =
    addConstraint(sum(coeffs), Le, rhs, name)
  def ge(coeffs: (Int, Double)*)(rhs: Double, name: String = ""): Unit =
    addConstraint(sum(coeffs), Ge, rhs, name)
  def eq(coeffs: (Int, Double)*)(rhs: Double, name: String = ""): Unit =
    addConstraint(sum(coeffs), Eq, rhs, name)

  private def sum(cs: Seq[(Int, Double)]): Map[Int, Double] =
    cs.groupBy(_._1).view.mapValues(_.map(_._2).sum).toMap

  def intVarIndices: Seq[Int] = variables.indices.filter(variables(_).isInt)

  /** Evaluates the objective at a point. */
  def objective(x: IndexedSeq[Double]): Double =
    variables.indices.iterator.map(i => variables(i).obj * x(i)).sum

  /** True when `x` satisfies all bounds and constraints within `tol`. */
  def isFeasible(x: IndexedSeq[Double], tol: Double = 1e-6): Boolean = {
    val boundsOk = variables.indices.forall { i =>
      x(i) >= variables(i).lb - tol && x(i) <= variables(i).ub + tol &&
        (!variables(i).isInt || math.abs(x(i) - math.round(x(i))) <= tol)
    }
    boundsOk && constraints.forall { c =>
      val v = c.coeffs.iterator.map { case (i, a) => a * x(i) }.sum
      c.sense match {
        case Le => v <= c.rhs + tol
        case Ge => v >= c.rhs - tol
        case Eq => math.abs(v - c.rhs) <= tol
      }
    }
  }
}
