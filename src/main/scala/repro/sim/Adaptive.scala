package repro.sim

import repro.core._

/** Epoch-driven adaptive re-optimization (Section VI): at the start of epoch
  * e the statistics of epoch e-1 are evaluated; if the optimizer's plan
  * changed (or the query set did), a new configuration is installed for epoch
  * e+1. The first configuration (from `initialStats`) activates immediately.
  *
  * `queriesAt` models query arrival/expiry (Section VI.B): it returns the
  * query set active at a point in time; removed queries drop out of the
  * optimizer input and their stores are reference-count-collected by the sim.
  */
final class AdaptiveController(
    queriesAt: Double => Vector[Query],
    catalog: Catalog,
    initialStats: Stats,
    nodeBudget: Long = 200000L,
    hysteresis: Double = 0.9, // rewire only when ≥10% estimated improvement
    useEstimates: Boolean = true, // false: plan from initialStats only (query changes still apply)
) extends Controller {

  private var lastPlanKey: Option[(Set[String], Set[StepKey])] = None
  private var lastSelection: Option[Selection] = None
  var reoptimizations = 0
  var installs = 0
  var bootstraps = 0

  override def onEpoch(epoch: Long, sim: EventSim): Unit = {
    val now = epoch * sim.params.epochLen
    val qs = queriesAt(now)
    if (qs.isEmpty) {
      // All queries expired: install an empty configuration once so stores
      // can be reference-count-collected after their windows pass.
      val key = (Set.empty[String], Set.empty[StepKey])
      if (lastPlanKey.isDefined && !lastPlanKey.contains(key)) {
        sim.installConfig(if (epoch == 0) 0L else epoch + 1,
                          Topology.build(Selection(Vector.empty, Vector.empty), catalog))
        lastPlanKey = Some(key)
        installs += 1
      }
      return
    }
    val window = qs.map(_.window).max

    val stats =
      if (epoch == 0 || !useEstimates) Some(initialStats)
      else sim.samples.estimate(epoch - 1, qs, window)

    stats.foreach { st =>
      reoptimizations += 1
      val planned = Planner.mqo(qs, catalog, st, nodeBudget)
      val key = (qs.map(_.name).toSet, planned.solution.steps)
      val queriesChanged = lastPlanKey.forall(_._1 != qs.map(_.name).toSet)
      val clearlyBetter = lastSelection.forall { cur =>
        planned.solution.cost < hysteresis * Planner.selectionCost(cur, st, catalog)
      }
      if (!lastPlanKey.contains(key) && (queriesChanged || clearlyBetter)) {
        val topo = Topology.build(planned.selection, catalog)
        val windowEpochs = math.ceil(window / sim.params.epochLen).toLong
        // Section VI.B bootstrap: when the new configuration only uses store
        // instances that every configuration over the last window already
        // maintained — e.g. a new query over relations other queries already
        // registered — install it retroactively for all epochs overlapping
        // the current window: the new query then answers over the existing
        // history instead of waiting a full window for complete answers.
        val retro = math.max(0L, epoch + 1 - windowEpochs)
        val target =
          if (epoch == 0) 0L
          else if (queriesChanged &&
                   topo.storeKeys.subsetOf(sim.coveredStoreKeys(retro, epoch))) {
            bootstraps += 1
            retro
          } else epoch + 1
        sim.installConfig(target, topo)
        lastPlanKey = Some(key)
        lastSelection = Some(planned.selection)
        installs += 1
      }
    }
    // keep a window of epochs: the selectivity estimator matches against the
    // union of samples over the last window
    val windowEpochs = math.ceil(window / sim.params.epochLen).toLong
    sim.samples.prune(epoch - windowEpochs - 2)
  }
}

/** Static strategy: one configuration from the initial statistics, never
  * re-optimized (the paper's "S" baseline in Fig. 8).
  */
object StaticPlan {
  def install(sim: EventSim, queries: Vector[Query], catalog: Catalog, stats: Stats,
              nodeBudget: Long = 200000L): Topology = {
    val planned = Planner.mqo(queries, catalog, stats, nodeBudget)
    val topo = Topology.build(planned.selection, catalog)
    sim.installConfig(0L, topo)
    topo
  }
}
