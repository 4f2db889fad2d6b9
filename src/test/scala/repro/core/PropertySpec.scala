package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Property-style invariants of the optimizer core over randomized queries
  * (seeded deterministic generation; 60 cases per property).
  */
class PropertySpec extends AnyFunSuite {

  private val relPool = Vector("A", "B", "C", "D", "E")
  private val attrPool = Vector("x", "y")

  /** Random connected query over 2..5 relations, deterministic in the seed. */
  private def genQuery(seed: Long): Query = {
    val rng = new java.util.Random(seed)
    val n = 2 + rng.nextInt(4)
    val rels = rng.ints(0, relPool.size).distinct().limit(n).toArray.map(relPool(_)).toVector
    var preds = Set.empty[Pred]
    for (i <- 1 until rels.size) {
      val from = rels(rng.nextInt(i))
      preds += Pred(Attr(from, attrPool(rng.nextInt(2))), Attr(rels(i), attrPool(rng.nextInt(2))))
    }
    if (rels.size > 2 && rng.nextBoolean()) {
      val a = rels(0); val b = rels(rels.size - 1)
      if (!preds.exists(p => p.rels == Set(a, b)))
        preds += Pred(Attr(a, "x"), Attr(b, "x"))
    }
    Query("q", rels.toSet, preds, 1.0)
  }

  private def cases: Seq[Query] = (1 to 60).map(s => genQuery(s * 7919L))

  private def bruteConnectedSubsets(q: Query): Set[Set[String]] = {
    val rels = q.relations.toVector
    (1 until (1 << rels.size)).map { mask =>
      rels.zipWithIndex.collect { case (r, i) if (mask & (1 << i)) != 0 => r }.toSet
    }.filter(rs => rs != q.relations && AttrEq.connectedRels(rs, q.inducedPreds(rs))).toSet
  }

  test("property: MIR enumeration = connected proper subsets") {
    cases.foreach { q =>
      val mirs = Mir.enumerate(q)
      assert(mirs.map(_.relSet) == bruteConnectedSubsets(q), q.toString)
      mirs.foreach { m =>
        assert(m.predicates == q.inducedPreds(m.relSet))
        assert(AttrEq.connectedRels(m.relSet, m.predicates))
      }
    }
  }

  test("property: probe orders start at the start relation and partition the query") {
    cases.foreach { q =>
      val mirs = Mir.enumerate(q)
      val sub = Subquery.ofQuery(q)
      q.relations.foreach { start =>
        val cands = ProbeOrders.candidatesFrom(sub, mirs, start)
        assert(cands.nonEmpty, s"no candidates from $start for $q")
        cands.foreach { po =>
          assert(po.elems.head == Mir.base(start))
          val all = po.elems.flatMap(_.relations)
          assert(all.toSet == q.relations && all.size == q.relations.size,
                 s"elements must partition the query: $po")
          for (t <- 1 until po.elems.size)
            assert(q.predicates.exists(_.connects(po.coveredAfter(t - 1), po.elems(t).relSet)))
        }
      }
    }
  }

  test("property: steps are prefixes with strictly growing coverage, no cross products") {
    cases.foreach { q =>
      val sub = Subquery.ofQuery(q)
      val mirs = Mir.enumerate(q)
      def parts(m: Mir) = ProbeOrders.partitionCandidates(m, Vector(q))
      for {
        start <- q.relations.toVector.sorted.take(2)
        po <- ProbeOrders.candidatesFrom(sub, mirs, start).take(3)
        d <- ProbeOrders.decorate(po, parts).take(3)
      } {
        val steps = d.steps
        assert(steps.size == po.elems.size - 1)
        steps.sliding(2).foreach {
          case Seq(a, b) => assert(a.coveredRels.subsetOf(b.coveredRels) &&
                                   a.coveredRels != b.coveredRels)
          case _         =>
        }
        steps.foreach(s => assert(s.probePreds.nonEmpty, s"cross-product step $s"))
      }
    }
  }

  test("property: step costs non-negative, chi is 1 or the target parallelism") {
    val catalog = Catalog(relPool.map(r => r -> RelDef(r, attrPool, 4)).toMap, 6)
    val stats = Stats(relPool.map(_ -> 50.0).toMap, Map.empty, 0.05)
    cases.foreach { q =>
      val sub = Subquery.ofQuery(q)
      val mirs = Mir.enumerate(q)
      def parts(m: Mir) = ProbeOrders.partitionCandidates(m, Vector(q))
      for {
        start <- q.relations.toVector.sorted.take(1)
        po <- ProbeOrders.candidatesFrom(sub, mirs, start).take(4)
        d <- ProbeOrders.decorate(po, parts).take(4)
        s <- d.steps
      } {
        val chi = CostModel.chi(s, catalog)
        assert(chi == 1.0 || chi == catalog.parallelism(s.target).toDouble)
        assert(CostModel.stepCost(s, stats, catalog) >= 0.0)
      }
    }
  }

  test("property: problems are well-formed and solvable") {
    val catalog = Catalog(relPool.map(r => r -> RelDef(r, attrPool, 3)).toMap, 3)
    val stats = Stats(relPool.map(_ -> 20.0).toMap, Map.empty, 0.05)
    cases.take(25).foreach { q =>
      val p = MqoProblem.build(Seq(q), catalog, stats)
      assert(p.querySlots.size == q.relations.size)
      p.querySlots.foreach(s => assert(p.slotCands(s).nonEmpty))
      p.slotCands.values.flatten.flatMap(_.mirsUsed).foreach { mk =>
        assert(p.mirSlots(mk).size == p.mirByKey(mk).size)
      }
      val sol = repro.ilp.Solver.solve(p, 20000L)
      assert(sol.cost >= 0.0)
      assert(p.querySlots.forall(sol.choice.contains))
    }
  }

  test("property: multi-query problems share step variables where expected") {
    val catalog = Catalog(relPool.map(r => r -> RelDef(r, attrPool, 3)).toMap, 3)
    val stats = Stats(relPool.map(_ -> 20.0).toMap, Map.empty, 0.05)
    (1 to 15).foreach { s =>
      val q1 = genQuery(s * 101L).copy(name = "q1")
      val q2 = genQuery(s * 103L).copy(name = "q2")
      if (q1.relations != q2.relations || q1.predicates != q2.predicates) {
        val joint = MqoProblem.build(Seq(q1, q2), catalog, stats)
        // one slot per (query, start relation)
        assert(joint.querySlots.size == q1.relations.size + q2.relations.size)
        // an identical duplicate query adds no new step variables at all
        val dup = MqoProblem.build(Seq(q1, q1.copy(name = "q1b")), catalog, stats)
        val single = MqoProblem.build(Seq(q1), catalog, stats)
        assert(dup.numYVars == single.numYVars, "duplicate query must share every step")
      }
    }
  }

  test("property: step identity is deterministic across rebuilds") {
    cases.take(20).foreach { q =>
      val catalog = Catalog(relPool.map(r => r -> RelDef(r, attrPool, 3)).toMap, 3)
      val stats = Stats(relPool.map(_ -> 20.0).toMap, Map.empty, 0.05)
      val a = MqoProblem.build(Seq(q), catalog, stats)
      val b = MqoProblem.build(Seq(q), catalog, stats)
      assert(a.stepCost.keySet == b.stepCost.keySet)
      assert(a.numVars == b.numVars)
    }
  }
}
