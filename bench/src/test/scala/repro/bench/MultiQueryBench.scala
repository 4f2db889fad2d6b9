package repro.bench

import repro.SparkSpec
import repro.exp.Fig7Experiment

/** Reproduces the multi-query performance experiment of Section VII.A
  * (Fig. 7b–7d) on TPC-H-lite stream workloads.
  *
  * Paper reference points (Storm/Flink cluster, TPC-H SF10):
  *  - 7b: naive sharing ≈1.4× throughput of independent execution;
  *        CLASH-MQO ≈2.6× the naive implementations
  *  - 7c: independent execution needs 3.1× the memory of shared at 5 queries,
  *        5.3× at 10 queries
  *  - 7d: CMQO mean latency is 14–16% higher than the other modes
  */
class MultiQueryBench extends SparkSpec {

  private def runWorkload(nQ: Int) = {
    val w = Fig7Experiment.workload(spark, sf = 0.005, horizon = 600.0, window = 60.0,
                                    nQueries = nQ, seed = 4242)
    println(s"== Fig 7: $nQ queries over TPC-H-lite streams (SF=0.005) ==")
    w.queries.foreach(q => println(
      s"  ${q.name}: ${q.relations.toVector.sorted.mkString(",")} on " +
      q.predicates.map(_.toString).toVector.sorted.mkString(" & ")))
    val rs = Fig7Experiment.run(w)
    println(Fig7Experiment.header)
    rs.foreach(r => println(r.tsv))
    val Vector(indep, shared, mqo) = rs
    println(f"throughput: shared/indep = ${shared.throughputProxy / indep.throughputProxy}%.2f (paper ≈1.4), " +
            f"cmqo/indep = ${mqo.throughputProxy / indep.throughputProxy}%.2f (paper ≈2.6)")
    println(f"memory: indep/shared = ${indep.peakStored.toDouble / shared.peakStored}%.2f " +
            f"(paper ${if (nQ == 5) "3.1" else "5.3"})")
    println(f"latency: cmqo/shared = ${mqo.meanLatencyMs / shared.meanLatencyMs}%.2f (paper ≈1.14–1.16)")
    rs
  }

  // Under nonzero network delay a probe can race its partner's in-flight
  // store op (both real systems and our simulator drop such results); exact
  // equality is asserted in the deterministic-mode unit tests. Here the
  // per-query counts must agree within a whisker.
  private def assertResultsClose(a: Map[String, Long], b: Map[String, Long], what: String): Unit = {
    assert(a.keySet == b.keySet, what)
    a.keySet.foreach { q =>
      val (x, y) = (a(q), b(q))
      assert(math.abs(x - y) <= math.max(3L, (0.01 * math.max(x, y)).toLong),
             s"$what: $q has $x vs $y results")
    }
  }

  test("fig 7 with 5 queries: sharing and MQO beat independent execution") {
    val Vector(indep, shared, mqo) = runWorkload(5)

    // correctness across strategies: per-query result counts agree
    assertResultsClose(indep.resultCounts, shared.resultCounts, "shared vs independent")
    assertResultsClose(indep.resultCounts, mqo.resultCounts, "MQO vs independent")
    assert(indep.resultCounts.values.sum > 0, "workload produced no results")

    // 7b: throughput ordering — sharing helps, global optimization helps more
    assert(shared.throughputProxy > indep.throughputProxy,
           "naive sharing should beat independent execution")
    assert(mqo.throughputProxy >= shared.throughputProxy * 0.9,
           "CMQO should be at least on par with naive sharing")
    // CMQO minimizes *estimated* probe cost; allow estimation slack on data
    assert(mqo.tuplesSent <= shared.tuplesSent * 1.15,
           "CMQO should not send appreciably more probe tuples than naive sharing")

    // 7c: memory — independent execution duplicates state per query
    val memRatio = indep.peakStored.toDouble / shared.peakStored
    assert(memRatio > 1.5, f"memory ratio $memRatio%.2f too low (paper: 3.1×)")
  }

  test("fig 7 with 10 queries: more sharing potential, larger memory gap") {
    val Vector(indep, shared, mqo) = runWorkload(10)

    assertResultsClose(indep.resultCounts, shared.resultCounts, "shared vs independent")
    assertResultsClose(indep.resultCounts, mqo.resultCounts, "MQO vs independent")

    assert(shared.throughputProxy > indep.throughputProxy)
    assert(mqo.tuplesSent <= shared.tuplesSent * 1.15)

    val memRatio10 = indep.peakStored.toDouble / shared.peakStored
    assert(memRatio10 > 2.0, f"memory ratio $memRatio10%.2f too low (paper: 5.3×)")
  }

  test("fig 7 probe work at SF=0.1, measured on Spark (Catalyst joins)") {
    val rs = Fig7Experiment.sparkProbeWork(spark, sf = 0.1, horizon = 600.0, window = 60.0,
                                           nQueries = 5, seed = 4242)
    println("== Fig 7 probe work at SF=0.1 (Spark-measured step counts) ==")
    println(Fig7Experiment.sparkHeader)
    rs.foreach(r => println(r.tsv))
    val Vector(indep, shared, mqo) = rs
    println(f"work: indep/shared = ${indep.probeTuples.toDouble / shared.probeTuples}%.2f, " +
            f"indep/cmqo = ${indep.probeTuples.toDouble / mqo.probeTuples}%.2f")
    assert(shared.probeTuples <= indep.probeTuples,
           "deduplicating shared steps can only reduce probe work")
    assert(mqo.probeTuples <= (shared.probeTuples * 1.15).toLong,
           "CMQO should not send appreciably more probe tuples than naive sharing")
    assert(shared.distinctSteps <= indep.distinctSteps)
  }
}
