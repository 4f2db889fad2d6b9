package repro.core

import scala.collection.mutable

/** A deployed store: an MIR store instance with a partitioning. */
final case class StoreDef(ref: StoreRef, parallelism: Int, window: Double) {
  def key: String = ref.key
}

/** A node of a probe tree (Section V.B): the probing behaviour registered for
  * one dataflow edge. A tuple arriving over this edge probes the target store
  * with `step.probePreds`; results are forwarded to `children`, emitted as
  * results of `emits`, and inserted into the MIR stores `storeInto`.
  *
  * `probeWindow` is the max window of the probe orders sharing this node —
  * matching uses it as a safe superset; each query's exact window is enforced
  * when its results are emitted.
  */
final case class TopoNode(
    id: String,
    step: Step,
    children: Vector[String],
    emits: Vector[String],
    storeInto: Vector[StoreRef],
    probeWindow: Double,
)

/** The executable operator topology: stores, per-relation ingestion targets,
  * probe-tree roots, and the edge ruleset (Section V.B, Algorithm 3).
  */
final case class Topology(
    stores: Map[String, StoreDef],
    ingest: Map[String, Vector[String]],
    roots: Map[String, Vector[String]],
    nodes: Map[String, TopoNode],
    queryWindows: Map[String, Double],
) {
  def maxWindow: Double = if (queryWindows.isEmpty) 0.0 else queryWindows.values.max
  def storeKeys: Set[String] = stores.keySet

  /** MIR store instances some node of this topology inserts into. */
  lazy val storeIntoKeys: Set[String] =
    nodes.values.flatMap(_.storeInto.map(_.key)).toSet
}

object Topology {

  /** Stable node id of a step (its decorated probe-order prefix). */
  def nodeId(k: StepKey): String =
    k.prefix.mkString(";") + "→" + k.target + "|" + k.preds + "|" + (if (k.routed) "r" else "b")

  /** Merge the selected probe orders into probe trees and build the topology.
    * Orders with equal decorated prefixes (equal step keys) share nodes —
    * shared computation is performed once (Fig. 4).
    */
  def build(sel: Selection, catalog: Catalog): Topology = {
    val maxWindow = if (sel.queries.isEmpty) 1.0 else sel.queries.map(_.window).max

    val children = mutable.Map[String, mutable.LinkedHashSet[String]]()
    val emits = mutable.Map[String, mutable.LinkedHashSet[String]]()
    val storeInto = mutable.Map[String, mutable.LinkedHashSet[StoreRef]]()
    val stepOf = mutable.LinkedHashMap[String, Step]()
    val windowOf = mutable.Map[String, Double]()
    val roots = mutable.Map[String, mutable.LinkedHashSet[String]]()

    // Store instances of a given MIR probed anywhere in the selection —
    // maintenance results must be inserted into each of them.
    val probedByMir: Map[String, Vector[StoreRef]] =
      sel.probedStores.groupBy(_.mir.key).view.mapValues(_.toVector.sortBy(_.key)).toMap

    for ((sid, cand) <- sel.orders) {
      val steps = cand.steps
      val ids = steps.map(s => nodeId(s.key))
      steps.zip(ids).foreach { case (s, id) =>
        stepOf.getOrElseUpdate(id, s)
        windowOf(id) = math.max(windowOf.getOrElse(id, 0.0), s.sub.window)
      }
      roots.getOrElseUpdate(cand.d.po.start, mutable.LinkedHashSet.empty) += ids.head
      for (t <- 0 until ids.size - 1)
        children.getOrElseUpdate(ids(t), mutable.LinkedHashSet.empty) += ids(t + 1)
      sid match {
        case QuerySlot(q, _) =>
          emits.getOrElseUpdate(ids.last, mutable.LinkedHashSet.empty) += q
        case MirSlot(mk, _) =>
          storeInto.getOrElseUpdate(ids.last, mutable.LinkedHashSet.empty) ++=
            probedByMir.getOrElse(mk, Vector.empty)
      }
    }

    val nodes = stepOf.map { case (id, s) =>
      id -> TopoNode(
        id,
        s,
        children.get(id).map(_.toVector).getOrElse(Vector.empty),
        emits.get(id).map(_.toVector).getOrElse(Vector.empty),
        storeInto.get(id).map(_.toVector).getOrElse(Vector.empty),
        windowOf(id),
      )
    }.toMap

    val stores = sel.probedStores.toVector.sortBy(_.key).map { ref =>
      ref.key -> StoreDef(ref, catalog.parallelism(ref.mir), maxWindow)
    }.toMap

    // Input tuples of a relation are stored in every probed base-store
    // instance of that relation.
    val ingest = stores.values
      .filter(_.ref.mir.isBase)
      .toVector
      .groupBy(_.ref.mir.relations.head)
      .view
      .mapValues(_.map(_.key).sorted)
      .toMap

    Topology(
      stores = stores,
      ingest = ingest,
      roots = roots.view.mapValues(_.toVector).toMap,
      nodes = nodes,
      queryWindows = sel.queries.map(q => q.name -> q.window).toMap,
    )
  }
}
