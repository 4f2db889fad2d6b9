package repro.ilp

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class IlpSpec extends AnyFunSuite {

  test("constraint evaluation and satisfaction") {
    val c = Constraint(Vector(Term(2.0, "x"), Term(-1.0, "y")), Ge, 1.0)
    assert(c.satisfied(Map("x" -> 1, "y" -> 1)))
    assert(!c.satisfied(Map("x" -> 0, "y" -> 0)))
    val e = Constraint(Vector(Term(1.0, "x"), Term(1.0, "y")), Eq, 1.0)
    assert(e.satisfied(Map("x" -> 1, "y" -> 0)))
    assert(!e.satisfied(Map("x" -> 1, "y" -> 1)))
    val l = Constraint(Vector(Term(1.0, "x")), Le, 0.0)
    assert(l.satisfied(Map("x" -> 0)) && !l.satisfied(Map("x" -> 1)))
  }

  test("brute force finds the constrained minimum") {
    // min x + 2y s.t. x + y >= 1
    val ilp = Ilp(
      Vector("x", "y"),
      Vector(Constraint(Vector(Term(1.0, "x"), Term(1.0, "y")), Ge, 1.0)),
      Vector(Term(1.0, "x"), Term(2.0, "y")))
    val Some((assign, obj)) = ilp.bruteForceMin()
    assert(obj === 1.0 && assign("x") == 1 && assign("y") == 0)
  }

  test("brute force detects infeasibility") {
    val ilp = Ilp(
      Vector("x"),
      Vector(Constraint(Vector(Term(1.0, "x")), Ge, 2.0)),
      Vector(Term(1.0, "x")))
    assert(ilp.bruteForceMin().isEmpty)
  }

  test("Eq.3-style constraint forces all step variables of a chosen plan") {
    // -C·x + c1·y1 + c2·y2 >= 0 with C = c1 + c2: x=1 forces y1=y2=1
    val ilp = Ilp(
      Vector("x", "y1", "y2"),
      Vector(
        Constraint(Vector(Term(1.0, "x")), Eq, 1.0),
        Constraint(Vector(Term(-30.0, "x"), Term(10.0, "y1"), Term(20.0, "y2")), Ge, 0.0)),
      Vector(Term(10.0, "y1"), Term(20.0, "y2")))
    val Some((assign, obj)) = ilp.bruteForceMin()
    assert(assign("y1") == 1 && assign("y2") == 1 && obj === 30.0)
  }

  test("fig-3 encoding shape: one-order constraints and per-candidate cost rows") {
    val q1 = Query("q1", Set("R", "S", "T"),
                   Set(Pred.of("R", "b", "S", "b"), Pred.of("S", "c", "T", "c")))
    val q2 = Query("q2", Set("S", "T", "U"),
                   Set(Pred.of("S", "c", "T", "c"), Pred.of("T", "d", "U", "d")))
    val catalog = Catalog(
      Seq("R", "S", "T", "U").map(r => r -> RelDef(r, Vector("b", "c", "d"), 5)).toMap, 5)
    val stats = Stats(Seq("R", "S", "T", "U").map(_ -> 100.0).toMap, Map.empty, 0.01)
    val p = MqoProblem.build(Seq(q1, q2), catalog, stats)
    val enc = IlpBuilder.encode(p)

    // one exactly-one constraint per (query, start) slot
    val oneOrder = enc.ilp.constraints.filter(_.tag.startsWith("one-order:"))
    assert(oneOrder.size == 6)
    oneOrder.foreach { c =>
      assert(c.sense == Eq && c.rhs == 1.0)
      assert(c.terms.forall(_.coeff == 1.0))
    }

    // fig-3: q1 from R has six decorated candidates (σ1..σ6)
    val q1R = oneOrder.find(_.tag == "one-order:q:q1:R").get
    assert(q1R.terms.size == 6)

    // candidates via an MIR must have maintenance constraints
    val maint = enc.ilp.constraints.filter(_.tag.startsWith("maintain:"))
    assert(maint.nonEmpty)
    maint.foreach { c =>
      assert(c.sense == Ge && c.rhs == 0.0)
      assert(c.terms.head.coeff == -1.0)
      assert(c.terms.tail.forall(_.coeff == 1.0))
    }

    // cost rows: -PCost·x + Σ StepCost·y >= 0 with balanced coefficients
    val cost = enc.ilp.constraints.filter(_.tag.startsWith("cost:"))
    assert(cost.nonEmpty)
    cost.foreach { c =>
      val neg = c.terms.filter(_.coeff < 0)
      assert(neg.size == 1)
      assert(math.abs(c.terms.map(_.coeff).sum) < 1e-6)
    }

    // shared steps share a y variable: σ1=(R,S[b],T[c]) and σ3=(R,S[b],T[d])
    // must reference the same y for their common first step
    val q1RCands = p.slotCands(QuerySlot("q1", "R"))
    val iterative = q1RCands.filter(_.d.po.elems.forall(_.isBase))
    val sb = iterative.filter(_.d.parts(0).contains(Attr("S", "b")))
    assert(sb.size == 2)
    val y1 = enc.yVar(sb(0).steps.head.key)
    val y2 = enc.yVar(sb(1).steps.head.key)
    assert(y1 == y2)
  }

  test("fig-3: sigma5 and sigma6 share the same ST maintenance (per MIR, not per partitioning)") {
    val q1 = Query("q1", Set("R", "S", "T"),
                   Set(Pred.of("R", "b", "S", "b"), Pred.of("S", "c", "T", "c")))
    val q2 = Query("q2", Set("S", "T", "U"),
                   Set(Pred.of("S", "c", "T", "c"), Pred.of("T", "d", "U", "d")))
    val catalog = Catalog(
      Seq("R", "S", "T", "U").map(r => r -> RelDef(r, Vector("b", "c", "d"), 5)).toMap, 5)
    val stats = Stats(Seq("R", "S", "T", "U").map(_ -> 100.0).toMap, Map.empty, 0.01)
    val p = MqoProblem.build(Seq(q1, q2), catalog, stats)
    val viaSt = p.slotCands(QuerySlot("q1", "R")).filter(_.mirsUsed.nonEmpty)
    assert(viaSt.size == 2) // ST[S.b] and ST[T.d]
    // both decorations point at the same MIR key -> same maintenance slots
    assert(viaSt.map(_.mirsUsed).distinct.size == 1)
    val mk = viaSt.head.mirsUsed.head
    assert(p.mirSlots(mk).size == 2) // one maintenance slot per input relation (S and T)
    // q2's <U, ST> candidates use the very same MIR
    val q2ViaSt = p.slotCands(QuerySlot("q2", "U")).filter(_.mirsUsed.nonEmpty)
    assert(q2ViaSt.nonEmpty && q2ViaSt.head.mirsUsed.head == mk)
  }

  test("number of ILP variables = candidates + distinct steps") {
    val q = Query("q", Set("A", "B"), Set(Pred.of("A", "x", "B", "x")))
    val catalog = Catalog.of(RelDef("A", Vector("x"), 2), RelDef("B", Vector("x"), 2))
    val stats = Stats(Map("A" -> 10.0, "B" -> 10.0), Map.empty, 0.1)
    val p = MqoProblem.build(Seq(q), catalog, stats)
    val enc = IlpBuilder.encode(p)
    assert(enc.ilp.numVars == p.numXVars + p.numYVars)
    assert(enc.ilp.numVars == p.numVars)
  }
}
