package repro.sim

import repro.{SparkSpec, TestData}
import repro.core._
import repro.data.Artificial
import repro.runtime.StreamJoinExec

/** Correctness of the event simulator: emitted results must equal the
  * brute-force windowed join and the Spark runtime on the same data, and
  * probe-message counts must equal the Spark-computed exact step counts.
  */
class EventSimSpec extends SparkSpec {

  private val catalog = Artificial.catalog(parallelism = 3)
  private val query = Artificial.query(window = 5.0)
  private def input = Artificial.tiny(40)

  private val det = SimParams(deterministic = true, epochLen = 1.0)

  private def stats(selST: Double = 0.01) = Stats(
    Map("R" -> 50.0, "S" -> 50.0, "T" -> 50.0, "U" -> 50.0),
    Map(Pred.of("R", "a", "S", "a") -> 0.02,
        Pred.of("S", "b", "T", "b") -> selST,
        Pred.of("T", "c", "U", "c") -> 0.02))

  private def runOnce(sel: Selection): Metrics = {
    val sim = new EventSim(catalog, det, recordResults = true)
    sim.installConfig(0L, Topology.build(sel, catalog))
    sim.run(input)
  }

  private def resultKeys(m: Metrics): Set[Map[String, Double]] =
    m.results.map { case (_, t) => TestData.simResultKey(query.relations, t) }.toSet

  test("tiny RSTU: one result per index, matching the brute-force join") {
    val expected = TestData.naiveJoin(query, input)
    assert(expected.nonEmpty)
    val m = runOnce(Planner.mqo(Seq(query), catalog, stats()).selection)
    assert(m.resultCount(query.name) == expected.size)
    assert(resultKeys(m) == expected)
  }

  test("results are identical across optimizer choices (different stats)") {
    val expected = TestData.naiveJoin(query, input)
    for (selST <- Seq(1e-6, 0.01, 0.9)) {
      val m = runOnce(Planner.mqo(Seq(query), catalog, stats(selST)).selection)
      assert(resultKeys(m) == expected, s"selST=$selST")
    }
  }

  test("results are identical with an MIR-based plan") {
    // Skew stats so the optimizer materializes an intermediate store.
    val st = Stats(
      Map("R" -> 10000.0, "S" -> 10.0, "T" -> 10.0, "U" -> 10.0),
      Map(Pred.of("R", "a", "S", "a") -> 0.1,
          Pred.of("S", "b", "T", "b") -> 0.001,
          Pred.of("T", "c", "U", "c") -> 0.001))
    val sel = Planner.mqo(Seq(query), catalog, st).selection
    assert(sel.probedStores.exists(!_.mir.isBase), "expected an MIR store in the plan")
    val m = runOnce(sel)
    assert(resultKeys(m) == TestData.naiveJoin(query, input))
  }

  test("sim equals the Spark runtime result for the same input") {
    val dfs = TestData.toDfs(spark, catalog, input)
    val sparkRows = StreamJoinExec.queryResult(query, dfs)
      .select(query.relations.toSeq.sorted.map(r =>
        org.apache.spark.sql.functions.col(StreamJoinExec.tsCol(r))): _*)
      .collect()
      .map(r => query.relations.toSeq.sorted.zipWithIndex.map { case (rel, i) =>
        s"ts:$rel" -> r.getDouble(i)
      }.toMap)
      .toSet
    val m = runOnce(Planner.mqo(Seq(query), catalog, stats()).selection)
    assert(resultKeys(m) == sparkRows)
  }

  test("probe-message counts equal Spark-computed exact step counts") {
    val sel = Planner.mqo(Seq(query), catalog, stats()).selection
    val topo = Topology.build(sel, catalog)
    val m = runOnce(sel)
    val dfs = TestData.toDfs(spark, catalog, input)
    topo.nodes.values.foreach { n =>
      val expected = StreamJoinExec.stepSentCount(n.step, dfs, catalog)
      assert(m.sentByNode(n.id) == expected,
             s"node ${n.id}: sim=${m.sentByNode(n.id)} spark=$expected")
    }
    assert(m.tuplesSent == topo.nodes.keys.toSeq.map(m.sentByNode).sum)
  }

  test("broadcast steps send parallelism times the tuples") {
    val sel = Planner.mqo(Seq(query), catalog, stats()).selection
    val topo = Topology.build(sel, catalog)
    topo.nodes.values.find(!_.step.routed).foreach { n =>
      val m = runOnce(sel)
      assert(m.sentByNode(n.id) % catalog.parallelism(n.step.target) == 0)
    }
  }

  test("rewiring mid-stream loses no results (epoch-scoped configs)") {
    val expected = TestData.naiveJoin(query, input)
    val selA = Planner.mqo(Seq(query), catalog, stats(0.9)).selection
    val selB = Planner.mqo(Seq(query), catalog, stats(1e-6)).selection
    assert(Topology.build(selA, catalog).nodes.keySet !=
           Topology.build(selB, catalog).nodes.keySet,
           "test needs two genuinely different configurations")
    val sim = new EventSim(catalog, det, recordResults = true)
    sim.installConfig(0L, Topology.build(selA, catalog))
    sim.installConfig(2L, Topology.build(selB, catalog))
    val m = sim.run(input)
    assert(m.results.map { case (_, t) => TestData.simResultKey(query.relations, t) }.toSet
           == expected)
  }

  test("per-epoch containers: no duplicate results across epochs") {
    val m = runOnce(Planner.mqo(Seq(query), catalog, stats()).selection)
    val keys = m.results.map { case (_, t) => TestData.simResultKey(query.relations, t) }
    assert(keys.size == keys.toSet.size, "duplicated results")
  }

  test("window eviction bounds store size") {
    val longInput = Artificial.tiny(400) // 40s of data, window 5s
    val sim = new EventSim(catalog, det)
    sim.installConfig(0L, Topology.build(Planner.mqo(Seq(query), catalog, stats()).selection, catalog))
    val m = sim.run(longInput)
    // stores hold ~4 relations × (window+slack) × 10/s ≈ well below the total
    assert(m.peakStored < longInput.size)
    // eviction happened: far more store operations than tuples retained
    assert(m.storeMsgs > m.peakStored)
  }

  test("stores of dropped configurations are garbage collected") {
    val selA = Planner.mqo(Seq(query), catalog, stats()).selection
    val sim = new EventSim(catalog, det)
    sim.installConfig(0L, Topology.build(selA, catalog))
    // install an empty config (query removed) from epoch 10 on
    sim.installConfig(10L, Topology.build(Selection(Vector.empty, Vector.empty), catalog))
    val m = sim.run(Artificial.tiny(400)) // runs until t=40 ≫ epoch 10 + window
    assert(m.storedNow == 0, s"stores not collected: ${m.storedNow}")
    assert(sim.activeStoreKeys.isEmpty)
  }

  test("failure is reported when memory exceeds the limit") {
    val sim = new EventSim(catalog, det.copy(memLimit = 10))
    sim.installConfig(0L, Topology.build(Planner.mqo(Seq(query), catalog, stats()).selection, catalog))
    val m = sim.run(input)
    assert(m.failedAt.isDefined)
  }

  test("latency buckets aggregate to the total result count") {
    val m = runOnce(Planner.mqo(Seq(query), catalog, stats()).selection)
    val bucketed = m.latencyBuckets.collect { case ((q, _), (_, n)) if q == query.name => n }.sum
    assert(bucketed == m.resultCount(query.name))
  }
}
