package repro.data

import repro.core._

/** The simulated optimization environment of Section VII.C: `nRels` input
  * relations with three attributes each, equal arrival rates, and a join
  * selectivity of rate⁻¹ between any two attributes. Queries are drawn
  * randomly (connected, no cross products); exact duplicates are eliminated.
  */
object Fig9Env {

  val attrs: Vector[String] = Vector("a", "b", "c")

  def relName(i: Int): String = f"r$i%03d"

  def catalog(nRels: Int, parallelism: Int = 5): Catalog =
    Catalog((0 until nRels).map(i => relName(i) -> RelDef(relName(i), attrs, parallelism)).toMap,
            parallelism)

  def stats(nRels: Int, rate: Double = 100.0): Stats =
    Stats((0 until nRels).map(relName(_) -> rate).toMap, Map.empty, defaultSel = 1.0 / rate)

  /** The canonical joinable attribute pair of a relation pair: two relations
    * can always be joined, on one fixed attribute pair (deterministic in the
    * pair). Queries over the same relation pair therefore share predicates —
    * the prerequisite for sharing probe-order prefixes across queries.
    */
  def pairPred(a: String, b: String): Pred = {
    val (x, y) = if (a < b) (a, b) else (b, a)
    val h = (x + "|" + y).hashCode
    Pred(Attr(x, attrs(math.floorMod(h, attrs.size))),
         Attr(y, attrs(math.floorMod(h / 7, attrs.size))))
  }

  /** Draw `nQ` distinct random queries of `size` relations each. */
  def randomQueries(nRels: Int, nQ: Int, size: Int, seed: Long, window: Double = 1.0): Vector[Query] = {
    val rng = new java.util.Random(seed)
    val out = Vector.newBuilder[Query]
    val seen = scala.collection.mutable.Set[(Set[String], Set[Pred])]()
    var made = 0
    var attempts = 0
    while (made < nQ && attempts < nQ * 200) {
      attempts += 1
      var rels = Vector(relName(rng.nextInt(nRels)))
      var preds = Set.empty[Pred]
      while (rels.size < size) {
        val from = rels(rng.nextInt(rels.size))
        var to = relName(rng.nextInt(nRels))
        while (rels.contains(to)) to = relName(rng.nextInt(nRels))
        preds += pairPred(from, to)
        rels :+= to
      }
      val key = (rels.toSet, preds)
      if (!seen(key)) {
        seen += key
        made += 1
        out += Query(f"q$made%03d", rels.toSet, preds, window)
      }
    }
    out.result()
  }
}
