package repro.core

/** A probe order ⟨S_1, e_2, …, e_k⟩ (Section IV): an arriving tuple of the
  * start relation visits the stores of the remaining elements in order,
  * incrementally computing the partial join where the start tuple is the
  * latest-arriving component. Elements are MIRs; their relation sets are
  * disjoint and together cover the subquery's relations.
  */
final case class ProbeOrder(sub: Subquery, start: String, elems: Vector[Mir]) {
  require(elems.nonEmpty && elems.head == Mir.base(start), "first element must be the start relation")

  /** Relations covered by elements 0..t (inclusive). */
  def coveredAfter(t: Int): Set[String] = elems.take(t + 1).flatMap(_.relations).toSet

  def length: Int = elems.size

  override def toString: String = s"⟨${elems.mkString(", ")}⟩@${sub.id}"
}

/** A probe order with a partitioning attribute chosen for every probed store
  * (elements 1..k-1; the start element is the arriving stream, not a probe
  * target). `None` means the store is randomly partitioned and every probe of
  * it must broadcast — only generated when no partitioning candidate exists.
  */
final case class Decorated(po: ProbeOrder, parts: Vector[Option[Attr]]) {
  require(parts.size == po.elems.size - 1, "one partitioning per probed element")

  /** Probed store references, in order. */
  def stores: Vector[StoreRef] =
    po.elems.tail.zip(parts).map { case (m, p) => StoreRef(m, p) }

  /** The t-th step (1-based, t = 1..k-1): the decorated prefix of length t+1.
    * Per Section V, a step is identified with its probe-order prefix; equal
    * steps in different queries' candidates share an ILP variable.
    */
  def step(t: Int): Step = {
    val prefixElems = po.elems.take(t)
    val prefixParts = parts.take(t - 1)
    Step(po.sub, po.start, prefixElems, prefixParts, po.elems(t), parts(t - 1))
  }

  def steps: Vector[Step] = (1 until po.elems.size).map(step).toVector

  /** Non-base MIRs this probe order relies on (they must be maintained). */
  def mirsUsed: Set[Mir] = po.elems.filterNot(_.isBase).toSet

  override def toString: String =
    (po.elems.head.toString +: stores.map(_.toString)).mkString("⟨", ", ", s"⟩@${po.sub.id}")
}

/** A store instance: an MIR store partitioned by a specific attribute. */
final case class StoreRef(mir: Mir, part: Option[Attr]) {
  def key: String = mir.key + "[" + part.map(_.full).getOrElse("∗") + "]"
  override def toString: String = mir.toString + "[" + part.map(_.full).getOrElse("∗") + "]"
}

/** One step of a decorated probe order: the partial result of joining
  * `prefixElems` (where the start tuple is latest) is sent to the store of
  * `target` partitioned by `targetPart`.
  *
  * Identity (`key`) captures everything that determines the transferred
  * tuples and the performed probe: the decorated prefix, the accumulated
  * predicates, the target store and the predicates connecting prefix and
  * target — so structurally equal steps of different queries share one
  * ILP variable and one physical dataflow edge.
  */
final case class Step(
    sub: Subquery,
    start: String,
    prefixElems: Vector[Mir],
    prefixParts: Vector[Option[Attr]],
    target: Mir,
    targetPart: Option[Attr],
) {
  def coveredRels: Set[String] = prefixElems.flatMap(_.relations).toSet
  def resultRels: Set[String] = coveredRels ++ target.relSet

  /** Predicates evaluated when probing: those connecting prefix and target. */
  def probePreds: Set[Pred] =
    sub.predicates.filter(_.connects(coveredRels, target.relSet))

  def targetRef: StoreRef = StoreRef(target, targetPart)

  /** True when the partitioning value of the target store is derivable from
    * the prefix tuple via the subquery's attribute-equality classes; false
    * means the prefix tuple must be broadcast to all target partitions.
    */
  def routed: Boolean = targetPart.exists { p =>
    val covered = coveredRels
    AttrEq.classOf(sub.predicates, p).exists(a => covered(a.rel))
  }

  /** The prefix attribute whose value routes this step (None = broadcast). */
  def routeAttr: Option[Attr] = targetPart.flatMap { p =>
    val covered = coveredRels
    AttrEq.classOf(sub.predicates, p).find(a => covered(a.rel))
  }

  def key: StepKey = {
    val prefixKey = prefixElems.head.key +: prefixElems.tail.zip(prefixParts).map {
      case (m, p) => StoreRef(m, p).key
    }
    val covered = resultRels
    StepKey(prefixKey, targetRef.key,
            sub.inducedPreds(covered).map(_.key).toSeq.sorted.mkString("&"),
            routed)
  }

  override def toString: String =
    (prefixElems.head.toString +: prefixElems.tail.zip(prefixParts).map { case (m, p) => StoreRef(m, p).toString })
      .mkString("⟨", ", ", "") + s" → $targetRef⟩"
}

/** Stable identity of a step across queries. */
final case class StepKey(prefix: Vector[String], target: String, preds: String, routed: Boolean)

/** Candidate probe-order construction (Algorithm 1) and partitioning
  * candidates / decoration (Section V).
  */
object ProbeOrders {

  /** Algorithm 1: all candidate probe orders of `sub` over the usable MIRs,
    * for every starting relation, avoiding cross products (each appended MIR
    * must be joined with the head by at least one predicate of `sub`).
    *
    * An MIR is usable within `sub` iff its relations lie in `sub` and its
    * predicates are exactly those `sub` induces on them (a same-named MIR
    * from a query with different join attributes is a different store).
    */
  def candidates(sub: Subquery, mirs: Set[Mir]): Vector[ProbeOrder] =
    sub.relations.toVector.sorted.flatMap(start => candidatesFrom(sub, mirs, start))

  def candidatesFrom(sub: Subquery, mirs: Set[Mir], start: String): Vector[ProbeOrder] = {
    val usable = mirs.filter { m =>
      m.relSet.subsetOf(sub.relations) &&
      m.predicates == sub.inducedPreds(m.relSet) &&
      !m.relSet.contains(start)
    }.toVector.sortBy(_.key)

    val out = Vector.newBuilder[ProbeOrder]
    def rec(head: Vector[Mir], covered: Set[String]): Unit = {
      if (covered == sub.relations) out += ProbeOrder(sub, start, head)
      else
        usable.foreach { m =>
          val disjoint = m.relSet.intersect(covered).isEmpty
          val joinable = sub.predicates.exists(_.connects(covered, m.relSet))
          if (disjoint && joinable) rec(head :+ m, covered ++ m.relSet)
        }
    }
    rec(Vector(Mir.base(start)), Set(start))
    out.result()
  }

  /** Partitioning candidates of a store (Section V): every attribute of the
    * MIR's relations that appears, in *any* query of the workload, in a join
    * predicate with a relation outside the MIR. (Fig. 3 offers T[d] even in
    * probe orders for q1, where only q2 joins on d.)
    */
  def partitionCandidates(m: Mir, workload: Seq[Query]): Vector[Attr] = {
    val inside = m.relSet
    workload
      .flatMap(_.predicates)
      .flatMap { p =>
        Seq(p.x, p.y).filter(a => inside(a.rel) && !inside(Seq(p.x, p.y).filter(_ != a).head.rel))
      }
      .distinct
      .sortBy(_.full)
      .toVector
  }

  /** Apply partitioning: every combination of partitioning candidates over the
    * probed elements. Stores with no candidate get `None` (random/broadcast).
    */
  def decorate(po: ProbeOrder, partsOf: Mir => Vector[Attr]): Vector[Decorated] = {
    val options: Vector[Vector[Option[Attr]]] = po.elems.tail.map { m =>
      val cs = partsOf(m)
      if (cs.isEmpty) Vector(Option.empty[Attr]) else cs.map(Option(_))
    }
    options
      .foldLeft(Vector(Vector.empty[Option[Attr]])) { (acc, opts) =>
        for (a <- acc; o <- opts) yield a :+ o
      }
      .map(Decorated(po, _))
  }
}
