package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.core._
import repro.data.Artificial

/** Section VI.B: a query arriving while its relations' stores are already
  * registered (for another query) is bootstrapped from the existing history —
  * it reports results with partners that arrived *before* the query did,
  * instead of waiting a full window for complete answers (Fig. 6).
  */
class BootstrapSpec extends AnyFunSuite {

  private val catalog = Artificial.catalog(parallelism = 2)
  private val window = 5.0
  // q1 runs from the start and registers all four base stores; q2 (same
  // relations, different name) arrives at t = 10 s.
  private val q1 = Artificial.query(window)
  private val q2 = q1.copy(name = "late")
  private val arrival = 10.0

  // initial statistics matching the generated data (cards per 5 s window,
  // true selectivities), so the installed plan is stable from epoch 0 on
  private val stats = Stats(
    Map("R" -> 500.0, "S" -> 250.0, "T" -> 1000.0, "U" -> 250.0),
    Map(Pred.of("R", "a", "S", "a") -> 1.0 / 250.0,
        Pred.of("S", "b", "T", "b") -> 1.0 / 250.0,
        Pred.of("T", "c", "U", "c") -> 1.0 / 1000.0))

  // Input with clear cost margins between plan alternatives: each S tuple
  // has two R and four T partners; every fourth T tuple has a U partner.
  private def input: Vector[InTuple] = {
    val dur = 20.0
    // up to 2 s deterministic jitter: combinations then span a good part of
    // the 5 s window, so some straddle the late query's arrival instant
    def jit(idx: Int, k: Long): Double =
      math.floorMod((k * 0x9e3779b97f4a7c15L) ^ (idx * 0x2545f4914f6cdd1dL), 1000000L) / 1000000.0 * 2.0
    def gen(rel: String, idx: Int, rate: Double)(f: Long => Map[String, Long]) =
      (0L until (rate * dur).toLong).map(k => InTuple(rel, f(k), k / rate + idx * 1e-7 + jit(idx, k)))
    (gen("R", 0, 100)(k => Map("R.a" -> k / 2)) ++
      gen("S", 1, 50)(k => Map("S.a" -> k, "S.b" -> k)) ++
      gen("T", 2, 200)(k => Map("T.b" -> k / 4, "T.c" -> k)) ++
      gen("U", 3, 50)(k => Map("U.c" -> 4 * k))).sortBy(_.ts).toVector
  }

  /** With `warm = true`, q1 runs from the start and registers the stores; the
    * late query can then bootstrap. With `warm = false`, nothing runs before
    * the late query arrives — a cold start.
    */
  private def run(warm: Boolean): (Metrics, AdaptiveController) = {
    val sim = new EventSim(catalog, SimParams(deterministic = true), recordResults = true)
    // fixed statistics isolate the query-arrival machinery from estimate
    // noise (estimate-driven re-planning is covered by AdaptiveSpec)
    val ctrl = new AdaptiveController(
      t => if (t >= arrival) Vector(q1, q2) else if (warm) Vector(q1) else Vector.empty,
      catalog, stats, useEstimates = false)
    (sim.run(input, controller = Some(ctrl)), ctrl)
  }

  test("a late query over registered stores answers across its full window") {
    val (m, ctrl) = run(warm = true)
    assert(ctrl.bootstraps >= 1, "retroactive bootstrap install did not fire")
    val got = m.results.collect {
      case ("late", t) => TestData.simResultKey(q2.relations, t)
    }.toSet
    assert(got.nonEmpty)
    // bootstrap evidence: results whose earliest component predates the
    // query's arrival (only reachable through pre-arrival store history)
    val preArrival = got.filter(_.values.min < arrival)
    assert(preArrival.nonEmpty, "no results with pre-arrival partners — bootstrap missing")
    // and they are correct: subset of the brute-force result
    val expected = TestData.naiveJoin(q2, input)
    assert(got.subsetOf(expected))
  }

  test("without pre-registered stores the late query misses pre-arrival partners") {
    val (m, ctrl) = run(warm = false)
    assert(ctrl.bootstraps == 0)
    val got = m.results.collect {
      case (q, t) if q == "late" => TestData.simResultKey(q2.relations, t)
    }.toSet
    val expected = TestData.naiveJoin(q2, input)
    assert(got.subsetOf(expected))
    // combinations whose earliest component predates the arrival epoch's
    // config cannot be produced — the window starts cold (Fig. 6)
    val preArrival = got.filter(_.values.min < arrival - 1.0)
    assert(preArrival.isEmpty, s"cold start should miss pre-arrival partners: $preArrival")
  }
}
