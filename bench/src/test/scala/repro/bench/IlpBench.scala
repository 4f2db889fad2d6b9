package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig9Experiment

/** Reproduces the ILP experiments of Section VII.C (Fig. 9a–9f).
  *
  * Paper reference points (Gurobi 9 on a 3.1 GHz i7):
  *  - 9a: MQO probe cost ≈ 50% of individual at many queries over 10 relations
  *  - 9b: ≈1717 ILP variables at 100 queries (10 relations), sub-linear growth
  *  - 9c: ≈15% savings at 50 queries over 100 relations
  *  - 9d: ≈3000 variables at 50 queries (100 relations), near-linear growth
  *  - 9e: runtime linear in #queries, ≈120 ms at 100 queries
  *  - 9f: 10 size-4 queries ≈ 10× slower than 10 size-3; size 5 ≫ size 4
  *
  * Our solver is a custom branch-and-bound, so absolute runtimes differ; the
  * assertions check the *shapes* (savings levels, growth behaviour).
  */
class IlpBench extends AnyFunSuite {

  test("fig 9a/9b: probe cost and problem size, 3-way queries over 10 relations") {
    println("== Fig 9a/9b: size-3 queries over 10 relations ==")
    println(Fig9Experiment.header)
    val rows = Seq(10, 20, 40, 60, 80, 100).map { nQ =>
      val r = Fig9Experiment.run(10, nQ, 3, seed = 7 * nQ)
      println(r.tsv)
      r
    }
    rows.foreach(r => assert(r.mqoCost <= r.individualCost + 1e-6))
    // paper: sharing saves ~50% at high query counts over few relations
    val atMax = rows.last
    assert(atMax.savings > 0.25, f"savings ${atMax.savings}%.2f too low for 10 relations")
    assert(atMax.savings > rows.head.savings, "savings should grow with query count")
    // problem size growth saturates over few relations (paper: sub-linear —
    // shared prefixes share variables, partitioning options saturate)
    val perQueryMid = rows(2).vars.toDouble / rows(2).nQ // nQ = 40
    val perQueryLast = atMax.vars.toDouble / atMax.nQ
    assert(perQueryLast < 1.3 * perQueryMid,
           s"vars/query kept growing: $perQueryMid -> $perQueryLast")
  }

  test("fig 9c/9d: probe cost and problem size, 3-way queries over 100 relations") {
    println("== Fig 9c/9d: size-3 queries over 100 relations ==")
    println(Fig9Experiment.header)
    val rows = Seq(10, 20, 40, 50).map { nQ =>
      val r = Fig9Experiment.run(100, nQ, 3, seed = 11 * nQ)
      println(r.tsv)
      r
    }
    rows.foreach(r => assert(r.mqoCost <= r.individualCost + 1e-6))
    val at50 = rows.last
    // paper: little overlap over 100 relations -> small savings (~15% at nQ=50)
    assert(at50.savings < 0.5, f"savings ${at50.savings}%.2f suspiciously high for 100 relations")
    // and much smaller than the 10-relation setting at the same query count
    val dense = Fig9Experiment.run(10, 50, 3, seed = 7 * 50)
    assert(at50.savings < dense.savings,
           f"100-rel savings ${at50.savings}%.2f should be below 10-rel ${dense.savings}%.2f")
    // 9d: problem size grows near-linearly: vars/query roughly constant
    val ratio = (rows.last.vars.toDouble / rows.last.nQ) / (rows.head.vars.toDouble / rows.head.nQ)
    assert(ratio > 0.5 && ratio < 2.0, s"vars/query ratio drifted: $ratio")
  }

  test("fig 9e: optimization runtime grows moderately with the number of queries") {
    println("== Fig 9e: runtime vs number of queries (100 relations, size 3) ==")
    println(Fig9Experiment.header)
    val rows = Seq(10, 50, 100).map { nQ =>
      val r = Fig9Experiment.run(100, nQ, 3, seed = 17 * nQ)
      println(r.tsv)
      r
    }
    // runtime at 100 queries stays in an interactive range (paper: 120 ms with
    // Gurobi; our B&B budget keeps it within seconds)
    assert(rows.last.totalMs < 60000.0, f"100-query optimization took ${rows.last.totalMs}%.0f ms")
  }

  test("fig 9f: runtime explodes with query size, not query count") {
    println("== Fig 9f: runtime vs query size (100 relations) ==")
    println(Fig9Experiment.header)
    val bySize = (3 to 5).map { size =>
      val r = Fig9Experiment.run(100, 10, size, seed = 13 * size)
      println(r.tsv)
      size -> r
    }.toMap
    // paper: one order of magnitude from size 3 to size 4, far more to size 5;
    // our proxy: the ILP itself (variables) grows steeply with query size
    assert(bySize(4).vars > 3 * bySize(3).vars)
    assert(bySize(5).vars > 3 * bySize(4).vars)
    assert(bySize(5).totalMs > bySize(3).totalMs)
    for (nQ <- Seq(20, 30)) {
      val r = Fig9Experiment.run(100, nQ, 4, seed = 19 * nQ)
      println(r.tsv)
    }
  }
}
