package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.types._
import org.apache.spark.sql.Row
import repro.core._
import repro.sim.InTuple

/** Shared helpers for correctness tests: reference (nested-loop) evaluation of
  * windowed multi-way joins over simulator tuples, and conversion of
  * simulator tuples to Spark DataFrames for cross-validation.
  */
object TestData {

  /** Brute-force reference: all result combinations of `q` over the input,
    * as sets of (attr -> value) plus per-relation timestamps.
    */
  def naiveJoin(q: Query, input: Seq[InTuple]): Set[Map[String, Double]] = {
    val byRel = input.groupBy(_.rel)
    val rels = q.relations.toVector.sorted
    def rec(i: Int, acc: Vector[InTuple]): Iterator[Vector[InTuple]] =
      if (i == rels.size) Iterator.single(acc)
      else byRel.getOrElse(rels(i), Nil).iterator.flatMap { t =>
        // prune early on predicates whose both sides are already bound
        val partial = acc :+ t
        val ok = q.predicates.forall { p =>
          (partial.find(_.rel == p.x.rel), partial.find(_.rel == p.y.rel)) match {
            case (Some(a), Some(b)) => a.vals(p.x.full) == b.vals(p.y.full)
            case _                  => true
          }
        }
        val inWindow = partial.map(_.ts).max - partial.map(_.ts).min <= q.window
        if (ok && inWindow) rec(i + 1, partial) else Iterator.empty
      }
    rec(0, Vector.empty)
      .map(combo => combo.map(t => s"ts:${t.rel}" -> t.ts).toMap)
      .toSet
  }

  /** Identity of a simulator result tuple: per-relation timestamps. */
  def simResultKey(rels: Set[String], t: repro.sim.ITuple): Map[String, Double] =
    rels.map(r => s"ts:$r" -> t.tss(r)).toMap

  /** Build per-relation DataFrames (attrs as Long, ts as Double) from
    * simulator tuples, for running the same input through Spark.
    */
  def toDfs(spark: SparkSession, catalog: Catalog, input: Seq[InTuple]): Map[String, DataFrame] =
    input.groupBy(_.rel).map { case (rel, ts) =>
      val attrs = catalog(rel).attrs
      val schema = StructType(
        attrs.map(a => StructField(a, LongType, nullable = false)) :+
          StructField("ts", DoubleType, nullable = false))
      val rows = ts.map(t => Row.fromSeq(attrs.map(a => t.vals(s"$rel.$a")) :+ t.ts))
      rel -> spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 2), schema)
    }
}
