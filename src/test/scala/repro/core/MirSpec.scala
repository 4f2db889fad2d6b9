package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MirSpec extends AnyFunSuite {

  private def linear(n: Int, window: Double = 1.0): Query = {
    val rels = (0 until n).map(i => s"L$i").toSet
    val preds = (0 until n - 1).map(i => Pred.of(s"L$i", "x", s"L${i + 1}", "x")).toSet
    Query(s"lin$n", rels, preds, window)
  }

  private def star(n: Int): Query = {
    val rels = (0 until n).map(i => s"S$i").toSet
    val preds = (1 until n).map(i => Pred.of("S0", "h", s"S$i", "x")).toSet
    Query(s"star$n", rels, preds)
  }

  private def clique(n: Int): Query = {
    val rels = (0 until n).map(i => s"C$i").toSet
    val preds = (for (i <- 0 until n; j <- i + 1 until n)
      yield Pred.of(s"C$i", "x", s"C$j", "x")).toSet
    Query(s"clq$n", rels, preds)
  }

  test("base MIR") {
    val b = Mir.base("R")
    assert(b.isBase && b.relations == Vector("R") && b.predicates.isEmpty)
  }

  test("Mir.of induces the query's predicates") {
    val q = linear(3)
    val m = Mir.of(q, Set("L0", "L1"))
    assert(m.predicates == Set(Pred.of("L0", "x", "L1", "x")))
  }

  test("linear query MIR count is the number of proper consecutive runs") {
    for (n <- 2 to 6) {
      val expected = n * (n + 1) / 2 - 1 // all runs minus the full query
      assert(Mir.enumerate(linear(n)).size == expected, s"n=$n")
    }
  }

  test("clique query MIR count is 2^n - 2 (all nonempty proper subsets)") {
    for (n <- 2 to 5)
      assert(Mir.enumerate(clique(n)).size == (1 << n) - 2, s"n=$n")
  }

  test("star query MIRs are the center-containing subsets plus the leaves") {
    for (n <- 3 to 5) {
      // connected subsets: any subset containing the center (2^(n-1)-1 proper
      // nonempty) plus each single leaf
      val expected = (1 << (n - 1)) - 2 + (n - 1) + 1
      assert(Mir.enumerate(star(n)).size == expected, s"n=$n")
    }
  }

  test("MIR enumeration excludes cross products") {
    val q = linear(4)
    val mirs = Mir.enumerate(q)
    assert(!mirs.exists(_.relSet == Set("L0", "L2")))
    assert(!mirs.exists(_.relSet == Set("L0", "L3")))
    assert(mirs.exists(_.relSet == Set("L1", "L2")))
  }

  test("MIR enumeration excludes the full relation set") {
    val q = linear(3)
    assert(!Mir.enumerate(q).exists(_.relSet == q.relations))
  }

  test("MIR enumeration includes all base relations") {
    val q = star(4)
    q.relations.foreach(r => assert(Mir.enumerate(q).contains(Mir.base(r))))
  }

  test("fig-3 example MIRs: R,S,T,U,RS,ST,TU") {
    // q1 = R(b), S(b,c), T(c);  q2 = S(c), T(c,d), U(d)
    val q1 = Query("q1", Set("R", "S", "T"),
                   Set(Pred.of("R", "b", "S", "b"), Pred.of("S", "c", "T", "c")))
    val q2 = Query("q2", Set("S", "T", "U"),
                   Set(Pred.of("S", "c", "T", "c"), Pred.of("T", "d", "U", "d")))
    val all = Mir.enumerate(q1) ++ Mir.enumerate(q2)
    val labels = all.map(m => m.relations.mkString(""))
    assert(labels == Set("R", "S", "T", "U", "RS", "ST", "TU"))
    // ST from q1 and from q2 share the same predicate — same identity
    val stQ1 = Mir.of(q1, Set("S", "T"))
    val stQ2 = Mir.of(q2, Set("S", "T"))
    assert(stQ1 == stQ2 && stQ1.key == stQ2.key)
  }

  test("same relations, different join attributes -> different MIRs") {
    val qa = Query("qa", Set("R", "S"), Set(Pred.of("R", "a", "S", "a")))
    val qb = Query("qb", Set("R", "S"), Set(Pred.of("R", "b", "S", "b")))
    assert(Mir.of(qa, Set("R", "S")) != Mir.of(qb, Set("R", "S")))
  }

  test("MIR key is stable and order-insensitive") {
    val q = linear(3)
    val m1 = Mir.of(q, Set("L0", "L1"))
    val m2 = Mir(Vector("L0", "L1"), Set(Pred.of("L1", "x", "L0", "x")))
    assert(m1.key == m2.key)
  }

  test("MIR requires sorted relations and internal predicates") {
    intercept[IllegalArgumentException](Mir(Vector("S", "R"), Set.empty))
    intercept[IllegalArgumentException](
      Mir(Vector("R", "S"), Set(Pred.of("S", "x", "T", "x"))))
  }

  test("Subquery.ofMir carries the MIR's predicates") {
    val q = linear(3)
    val m = Mir.of(q, Set("L0", "L1"))
    val sub = Subquery.ofMir(m, 2.0)
    assert(sub.relations == Set("L0", "L1"))
    assert(sub.predicates == m.predicates)
    assert(sub.window == 2.0)
  }
}
