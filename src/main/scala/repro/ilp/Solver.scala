package repro.ilp

import repro.core._
import scala.collection.mutable

/** Exact branch-and-bound solver for the MQO selection problem.
  *
  * The ILP of Algorithm 2 has a pure selection structure: pick exactly one
  * candidate per active slot; a candidate activates the maintenance slots of
  * the MIRs it uses; the objective is the cost of the union of selected
  * steps. The solver searches that structure directly:
  *
  *  - a greedy pass (cheapest marginal candidate per slot) seeds the incumbent;
  *  - depth-first branch and bound, candidates ordered by marginal cost
  *    against the currently selected steps;
  *  - step costs are monotone (a step never gets cheaper by selecting more),
  *    so `currentCost >= incumbent` prunes safely;
  *  - an optional node budget makes the solver anytime: when exhausted the
  *    incumbent is returned with `optimal = false` (like a MIP gap).
  *
  * Validated against brute-force enumeration of the selection problem and
  * against `Ilp.bruteForceMin` of the Algorithm 2 encoding (see tests).
  */
object Solver {

  final case class Solution(
      choice: Map[SlotId, Int],
      steps: Set[StepKey],
      cost: Double,
      optimal: Boolean,
      nodes: Long,
  ) {
    /** The selected candidates, resolved against the problem. */
    def selected(p: MqoProblem): Vector[(SlotId, Cand)] =
      choice.toVector.sortBy(_._1.key).map { case (sid, i) => sid -> p.slotCands(sid)(i) }
  }

  private val Eps = 1e-9

  /** Solve for all queries of the problem. */
  def solve(p: MqoProblem, nodeBudget: Long = 500000L): Solution = {
    require(p.querySlots.forall(s => p.slotCands(s).nonEmpty), "empty query slot")

    val stepRef = mutable.Map[StepKey, Int]()
    var curCost = 0.0
    val choice = mutable.LinkedHashMap[SlotId, Int]()
    var nodes = 0L
    var exhausted = true
    var bestCost = Double.PositiveInfinity
    var bestChoice: Map[SlotId, Int] = Map.empty
    var bestSteps: Set[StepKey] = Set.empty

    def add(c: Cand): Unit =
      c.costed.foreach { case (k, cost) =>
        val r = stepRef.getOrElse(k, 0)
        if (r == 0) curCost += cost
        stepRef(k) = r + 1
      }

    def remove(c: Cand): Unit =
      c.costed.foreach { case (k, cost) =>
        val r = stepRef(k) - 1
        if (r == 0) { curCost -= cost; stepRef.remove(k) }
        else stepRef(k) = r
      }

    def marginal(c: Cand): Double =
      c.costed.iterator.map { case (k, cost) =>
        if (stepRef.getOrElse(k, 0) > 0) 0.0 else cost
      }.sum

    // Rough (non-admissible, ordering-only) estimate of what activating the
    // not-yet-active MIRs of a candidate will add in maintenance cost.
    val maintEst = mutable.Map[String, Double]()
    def maintenanceEstimate(mk: String): Double =
      maintEst.getOrElseUpdate(mk, {
        maintEst(mk) = 0.0 // break recursion on (impossible) cycles
        p.mirSlots(mk).map { sid =>
          val cs = p.slotCands(sid)
          if (cs.isEmpty) 0.0
          else cs.map(c => c.cost + c.mirsUsed.map(maintenanceEstimate).sum).min
        }.sum
      })

    def orderingScore(c: Cand, active: Set[String]): Double =
      marginal(c) + c.mirsUsed.filterNot(active).map(maintenanceEstimate).sum

    def record(): Unit = {
      if (curCost < bestCost - Eps) {
        bestCost = curCost
        bestChoice = choice.toMap
        bestSteps = stepRef.keySet.toSet
      }
    }

    def rec(pending: List[SlotId], active: Set[String], greedyOnly: Boolean): Unit = {
      if (!greedyOnly && nodes > nodeBudget) { exhausted = false; return }
      pending match {
        case Nil => record()
        case sid :: rest =>
          val cands = p.slotCands(sid)
          val ordered = cands.zipWithIndex.sortBy { case (c, _) => orderingScore(c, active) }
          val toTry = if (greedyOnly) ordered.take(1) else ordered
          var continue = true
          for ((c, i) <- toTry if continue) {
            nodes += 1
            if (!greedyOnly && nodes > nodeBudget) { exhausted = false; continue = false }
            else {
              add(c)
              if (curCost < bestCost - Eps) {
                val newMirs = c.mirsUsed.filterNot(active)
                val newSlots = newMirs.flatMap(mk => p.mirSlots(mk)).toList
                choice(sid) = i
                rec(rest ::: newSlots, active ++ newMirs, greedyOnly)
                choice.remove(sid)
              }
              remove(c)
            }
          }
      }
    }

    // Coordinate descent on the incumbent: re-pick each slot's candidate to
    // the cheapest marginal, restricted to moves that keep the candidate's
    // MIR usage (so the active slot set stays valid). Captures cross-query
    // sharing far better than a single greedy pass.
    def descend(): Unit = {
      if (!bestCost.isFinite) return
      val assign = mutable.LinkedHashMap(bestChoice.toVector.sortBy(_._1.key): _*)
      assign.foreach { case (sid, i) => add(p.slotCands(sid)(i)) }
      var sweeps = 0
      var improvedAny = true
      while (improvedAny && sweeps < 25) {
        improvedAny = false
        sweeps += 1
        assign.keys.toVector.foreach { sid =>
          val cands = p.slotCands(sid)
          val curIdx = assign(sid)
          val cur = cands(curIdx)
          remove(cur)
          var bestIdx = curIdx
          var bestMarg = marginal(cur)
          cands.zipWithIndex.foreach { case (c, i) =>
            if (i != curIdx && c.mirsUsed == cur.mirsUsed) {
              val mg = marginal(c)
              if (mg < bestMarg - Eps) { bestMarg = mg; bestIdx = i }
            }
          }
          add(cands(bestIdx))
          if (bestIdx != curIdx) { assign(sid) = bestIdx; improvedAny = true }
        }
      }
      if (curCost < bestCost - Eps) {
        bestCost = curCost
        bestChoice = assign.toMap
        bestSteps = stepRef.keySet.toSet
      }
      assign.foreach { case (sid, i) => remove(p.slotCands(sid)(i)) }
    }

    val roots = p.querySlots.toList
    // Multi-start greedy incumbents (cheap), improved by coordinate descent,
    // then exact branch-and-bound within the node budget.
    val shuffles = {
      val base = p.querySlots.toVector
      Vector(base, base.reverse) ++
        Seq(7L, 23L).map(s => new scala.util.Random(s).shuffle(base))
    }
    shuffles.foreach(o => rec(o.toList, Set.empty, greedyOnly = true))
    descend()
    rec(roots, Set.empty, greedyOnly = false)

    require(bestCost.isFinite, "no feasible selection found")
    Solution(bestChoice, bestSteps, bestCost, optimal = exhausted, nodes = nodes)
  }

  /** Total cost of a set of per-query solutions executed without any sharing
    * across queries (each query pays its own steps — the Independent
    * baseline). Sharing *within* one query's plan is still counted once.
    */
  def unsharedTotal(perQuery: Seq[Solution]): Double = perQuery.map(_.cost).sum

  /** Total cost of per-query-optimal solutions with common steps deduplicated
    * across queries (the naive Shared baseline).
    */
  def sharedTotal(perQuery: Seq[(MqoProblem, Solution)]): Double = {
    val seen = mutable.Map[StepKey, Double]()
    for ((prob, sol) <- perQuery; k <- sol.steps) seen(k) = prob.stepCost(k)
    seen.values.sum
  }
}
