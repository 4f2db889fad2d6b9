package repro.core

import repro.ilp.Solver
import scala.collection.mutable

/** The set of probe orders actually installed (query orders + MIR maintenance
  * orders), produced by one of the planning strategies.
  */
final case class Selection(
    queries: Vector[Query],
    orders: Vector[(SlotId, Cand)],
) {
  /** Distinct physical steps of the selection (shared prefixes counted once). */
  def distinctSteps: Map[StepKey, Step] =
    orders.flatMap { case (_, c) => c.steps.map(s => s.key -> s) }.toMap

  /** Distinct costed steps (probe steps + MIR insert steps). */
  def distinctCosted: Map[StepKey, Double] =
    orders.flatMap(_._2.costed).toMap

  /** Probe cost when identical steps are executed once (Shared / CMQO). */
  def sharedCost: Double = distinctCosted.values.sum

  /** Probe cost when every probe order pays its own steps. */
  def unsharedCost: Double = orders.map(_._2.cost).sum

  /** All store instances probed by some step. */
  def probedStores: Set[StoreRef] = distinctSteps.values.map(_.targetRef).toSet
}

/** Planning strategies of Section VII.A:
  *  - `mqo`: global ILP over all queries (CLASH-MQO);
  *  - `individual`: each query optimized in isolation (FI/SI baselines);
  *  - `sharedFromIndividual`: individually optimal plans with common steps
  *    and stores deduplicated afterwards (FS/SS baselines).
  */
object Planner {

  final case class Planned(problem: MqoProblem, solution: Solver.Solution) {
    def selection: Selection =
      Selection(problem.queries, solution.selected(problem))
  }

  /** Global multi-query optimization: one ILP over the whole workload. */
  def mqo(queries: Seq[Query], catalog: Catalog, stats: Stats, nodeBudget: Long = 500000L): Planned = {
    val p = MqoProblem.build(queries, catalog, stats)
    Planned(p, Solver.solve(p, nodeBudget))
  }

  /** Per-query optimization in isolation (own problem, own partitioning
    * candidates — the query does not know about the rest of the workload).
    */
  def individual(queries: Seq[Query], catalog: Catalog, stats: Stats, nodeBudget: Long = 500000L): Vector[Planned] =
    queries.toVector.map { q =>
      val p = MqoProblem.build(Seq(q), catalog, stats)
      Planned(p, Solver.solve(p, nodeBudget))
    }

  /** Merge individually optimal plans into one shared selection: stores and
    * identical steps are deduplicated, but plan *choice* stays locally optimal.
    */
  /** Re-cost an existing selection under (possibly newer) statistics: sum of
    * its distinct probe-step costs plus the MIR insert costs. Used for
    * reconfiguration hysteresis (only rewire on a clear improvement).
    */
  def selectionCost(sel: Selection, stats: Stats, catalog: Catalog): Double = {
    val costs = mutable.Map[StepKey, Double]()
    sel.orders.foreach { case (sid, c) =>
      c.steps.foreach(s => costs(s.key) = CostModel.stepCost(s, stats, catalog))
      sid match {
        case MirSlot(mk, start) =>
          val sub = c.d.po.sub
          costs(StepKey(Vector(start), s"insert:$mk", "", routed = true)) =
            stats.joinCard(sub.relations, sub.predicates) / sub.relations.size
        case _ =>
      }
    }
    costs.values.sum
  }

  def sharedFromIndividual(planned: Seq[Planned]): Selection = {
    val orders = planned.toVector.flatMap(_.selection.orders)
    // Deduplicate maintenance slots selected by several queries for the same MIR.
    val dedup = orders.groupBy { case (sid, c) => (sid.key, c.d.toString) }.values.map(_.head).toVector
    Selection(planned.toVector.flatMap(_.problem.queries), dedup)
  }
}
