package repro.core

/** Problem model of the paper (§II), over a densely encoded relation.
  *
  * A relation row is a full assignment of every dimension column plus one
  * numeric target value. Dimension values are dictionary-encoded to dense
  * ints so that scope membership checks and fact lookups are array work.
  */
final case class EncodedRow(dims: Array[Int], target: Double)

/** A relation to summarize: dimension dictionaries plus encoded rows.
  *
  * @param dimNames   names of the dimension columns, index-aligned with rows
  * @param dimValues  per dimension, the dictionary mapping value id -> label
  * @param rows       the encoded rows
  */
final case class EncodedRelation(
    dimNames: IndexedSeq[String],
    dimValues: IndexedSeq[IndexedSeq[String]],
    rows: Array[EncodedRow]) {

  def numDims: Int = dimNames.length
  def numRows: Int = rows.length

  /** Cardinality of each dimension's dictionary. */
  def cards: IndexedSeq[Int] = dimValues.map(_.length)

  /** Mean of the target column — the paper's constant prior (§VIII-A). */
  def targetMean: Double =
    if (rows.isEmpty) 0.0 else rows.iterator.map(_.target).sum / rows.length

  /** Rows whose dimension values satisfy every `(dim, value)` predicate. */
  def filter(predicates: Seq[(Int, Int)]): EncodedRelation =
    copy(rows = rows.filter(r => predicates.forall { case (d, v) => r.dims(d) == v }))
}

object EncodedRelation {

  /** Dictionary-encode raw string-valued rows. Dictionaries are sorted so
    * encoding is deterministic regardless of row order.
    */
  def encode(
      dimNames: IndexedSeq[String],
      raw: Seq[(IndexedSeq[String], Double)]): EncodedRelation = {
    val d = dimNames.length
    val dicts = (0 until d).map { i =>
      raw.iterator.map(_._1(i)).toSet.toIndexedSeq.sorted
    }
    val lookup = dicts.map(vs => vs.zipWithIndex.toMap)
    val rows = raw.iterator.map { case (vals, t) =>
      EncodedRow(Array.tabulate(d)(i => lookup(i)(vals(i))), t)
    }.toArray
    EncodedRelation(dimNames, dicts, rows)
  }
}

/** A fact (§II Def. 2): a scope restricting a subset of the dimensions plus
  * the mean target value ("typical value") over rows within scope.
  *
  * @param dims    restricted dimension indexes, strictly increasing
  * @param values  dictionary ids, aligned with `dims`
  * @param typical mean target value over rows within scope
  * @param support number of rows within scope
  */
final case class Fact(dims: Array[Int], values: Array[Int], typical: Double, support: Long) {

  /** Whether row `r` is within this fact's scope (Def. 2). */
  def inScope(r: EncodedRow): Boolean = {
    var i = 0
    while (i < dims.length) {
      if (r.dims(dims(i)) != values(i)) return false
      i += 1
    }
    true
  }

  /** Human-readable scope, e.g. `season=Winter ∧ region=South`. */
  def describeScope(rel: EncodedRelation): String =
    if (dims.isEmpty) "overall"
    else dims.indices
      .map(i => s"${rel.dimNames(dims(i))}=${rel.dimValues(dims(i))(values(i))}")
      .mkString(" ∧ ")
}

/** A speech (§II Def. 3): a set of facts, here carried with its utility. */
final case class Speech(facts: IndexedSeq[Fact], utility: Double)

/** Exact per-row evaluation of the user model (§II Defs. 4–6). */
object Eval {

  /** Expected value for a row after hearing `facts` (Def. 4): the candidate
    * value — prior plus typical values of in-scope facts — closest to the
    * row's true target value.
    */
  def expectation(facts: Seq[Fact], r: EncodedRow, prior: Double): Double = {
    var best = prior
    var bestDev = math.abs(prior - r.target)
    facts.foreach { f =>
      if (f.inScope(r)) {
        val dev = math.abs(f.typical - r.target)
        if (dev < bestDev) { bestDev = dev; best = f.typical }
      }
    }
    best
  }

  /** Accumulated deviation D(F) over all rows (Def. 5). */
  def deviation(rel: EncodedRelation, facts: Seq[Fact], prior: Double): Double = {
    var sum = 0.0
    rel.rows.foreach { r =>
      var dev = math.abs(prior - r.target)
      facts.foreach { f =>
        if (f.inScope(r)) dev = math.min(dev, math.abs(f.typical - r.target))
      }
      sum += dev
    }
    sum
  }

  /** Utility U(F) = D(∅) − D(F) (Def. 6). */
  def utility(rel: EncodedRelation, facts: Seq[Fact], prior: Double): Double =
    deviation(rel, Nil, prior) - deviation(rel, facts, prior)
}
