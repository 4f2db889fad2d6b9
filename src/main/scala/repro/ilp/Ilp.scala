package repro.ilp

/** A linear term `coeff * var`. */
final case class Term(coeff: Double, v: String)

sealed trait Sense
case object Ge extends Sense
case object Le extends Sense
case object Eq extends Sense

/** A linear constraint `Σ terms  sense  rhs`. */
final case class Constraint(terms: Vector[Term], sense: Sense, rhs: Double, tag: String = "") {
  def eval(assign: String => Int): Double = terms.map(t => t.coeff * assign(t.v)).sum
  def satisfied(assign: String => Int): Boolean = {
    val lhs = eval(assign)
    sense match {
      case Ge => lhs >= rhs - 1e-9
      case Le => lhs <= rhs + 1e-9
      case Eq => math.abs(lhs - rhs) <= 1e-9
    }
  }
  override def toString: String = {
    val l = terms.map(t => f"${t.coeff}%+.4g·${t.v}").mkString(" ")
    val s = sense match { case Ge => ">="; case Le => "<="; case Eq => "=" }
    s"$l $s $rhs" + (if (tag.nonEmpty) s"  [$tag]" else "")
  }
}

/** A 0/1 integer linear program: minimize `objective` subject to `constraints`.
  * All variables are binary. Includes an exhaustive solver used as a test
  * oracle on small instances.
  */
final case class Ilp(vars: Vector[String], constraints: Vector[Constraint], objective: Vector[Term]) {
  require(objective.forall(t => vars.contains(t.v)), "objective over unknown variables")

  def numVars: Int = vars.size
  def numConstraints: Int = constraints.size

  def objectiveValue(assign: String => Int): Double =
    objective.map(t => t.coeff * assign(t.v)).sum

  def feasible(assign: String => Int): Boolean = constraints.forall(_.satisfied(assign))

  /** Exhaustive minimization over all 2^n assignments (test oracle only). */
  def bruteForceMin(maxVars: Int = 24): Option[(Map[String, Int], Double)] = {
    require(vars.size <= maxVars, s"brute force limited to $maxVars vars, got ${vars.size}")
    var best: Option[(Map[String, Int], Double)] = None
    val n = vars.size
    var mask = 0L
    val limit = 1L << n
    while (mask < limit) {
      val assign = vars.zipWithIndex.map { case (v, i) => v -> (((mask >> i) & 1L).toInt) }.toMap
      if (feasible(assign)) {
        val obj = objectiveValue(assign)
        if (best.forall(_._2 > obj + 1e-12)) best = Some((assign, obj))
      }
      mask += 1
    }
    best
  }
}
