package repro.sim

import repro.core._
import scala.collection.mutable

/** Per-epoch statistics gathering (Section VI.A): arrival counts and a
  * deterministic reservoir sample per relation, turned into cardinality and
  * per-predicate selectivity estimates for the optimizer at epoch boundaries.
  */
final class EpochSamples(epochLen: Double, sampleSize: Int = 512) {

  private final class EpochData {
    val counts = mutable.Map[String, Long]().withDefaultValue(0L)
    val reservoirs = mutable.Map[String, mutable.ArrayBuffer[InTuple]]()
    val rngs = mutable.Map[String, java.util.Random]()
  }

  private val epochs = mutable.Map[Long, EpochData]()

  def observe(epoch: Long, t: InTuple): Unit = {
    val d = epochs.getOrElseUpdate(epoch, new EpochData)
    val n = d.counts(t.rel)
    d.counts(t.rel) = n + 1
    val res = d.reservoirs.getOrElseUpdate(t.rel, mutable.ArrayBuffer.empty)
    if (res.size < sampleSize) res += t
    else {
      val rng = d.rngs.getOrElseUpdate(t.rel, new java.util.Random(epoch * 31 + t.rel.hashCode))
      val j = (rng.nextDouble() * (n + 1)).toLong
      if (j < sampleSize) res(j.toInt) = t
    }
  }

  def count(epoch: Long, rel: String): Long =
    epochs.get(epoch).map(_.counts(rel)).getOrElse(0L)

  /** Estimate Stats from epoch data: per-window cardinality = rate × window,
    * and per-predicate selectivity as the match rate between the epoch's
    * sample and the union of samples over the last window of epochs. Matching
    * against the window-wide union (instead of epoch-local pairs) avoids
    * overestimating selectivity for time-correlated keys. Returns None when a
    * referenced relation has no sample in the epoch.
    */
  def estimate(epoch: Long, queries: Seq[Query], window: Double): Option[Stats] = {
    val d = epochs.get(epoch).getOrElse(return None)
    val rels = queries.flatMap(_.relations).toSet
    if (!rels.forall(r => d.counts(r) > 0)) return None

    val card = rels.map(r => r -> d.counts(r).toDouble / epochLen * window).toMap

    val windowEpochs = math.max(1L, math.ceil(window / epochLen).toLong)
    def windowSample(rel: String): Vector[InTuple] =
      (math.max(0L, epoch - windowEpochs + 1) to epoch).flatMap(e =>
        epochs.get(e).flatMap(_.reservoirs.get(rel)).getOrElse(Nil)).toVector

    val preds = queries.flatMap(_.predicates).toSet
    val sel = preds.map { p =>
      val sa = d.reservoirs(p.x.rel)
      val sb = windowSample(p.y.rel)
      val byVal = mutable.Map[Long, Long]().withDefaultValue(0L)
      sa.foreach(t => byVal(t.vals(p.x.full)) += 1)
      var m = 0L
      sb.foreach(t => m += byVal(t.vals(p.y.full)))
      p -> m.toDouble / (sa.size.toLong * sb.size.toLong)
    }.toMap

    Some(Stats(card, sel))
  }

  /** Drop epochs older than `beforeEpoch` to bound memory. */
  def prune(beforeEpoch: Long): Unit =
    epochs.keys.filter(_ < beforeEpoch).toVector.foreach(epochs.remove)
}
