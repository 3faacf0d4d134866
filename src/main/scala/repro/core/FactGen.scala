package repro.core

import scala.collection.mutable

/** Enumeration of candidate facts (§III): one fact per scope pattern — a
  * subset of at most `maxFactDims` dimension columns — and per combination
  * of dimension values that actually appears in the data (Thm 9 bounds the
  * count). The empty pattern yields the overall-average fact.
  */
object FactGen {

  /** All subsets of `0 until d` with at most `maxSize` elements, ordered by
    * size then lexicographically — the fact groups of Alg. 3 (`PowerSet`).
    */
  def patterns(d: Int, maxSize: Int): IndexedSeq[Array[Int]] = {
    val all = (0 until d).toSet.subsets()
      .filter(_.size <= maxSize)
      .map(_.toArray.sorted)
      .toIndexedSeq
    all.sortBy(p => (p.length, p.map(i => f"$i%04d").mkString(",")))
  }

  def build(rel: EncodedRelation, maxFactDims: Int): FactIndex = {
    val ps = patterns(rel.numDims, maxFactDims)
    val cards = rel.cards
    // Mixed-radix strides per pattern so a row's values within the pattern
    // collapse to one Long key.
    val strides: IndexedSeq[Array[Long]] = ps.map { p =>
      val s = new Array[Long](p.length)
      var acc = 1L
      var i = 0
      while (i < p.length) { s(i) = acc; acc *= cards(p(i)); i += 1 }
      s
    }
    val sums   = ps.map(_ => new mutable.LongMap[Double]())
    val counts = ps.map(_ => new mutable.LongMap[Long]())
    rel.rows.foreach { r =>
      var pi = 0
      while (pi < ps.length) {
        val key = FactIndex.keyOf(ps(pi), strides(pi), r)
        sums(pi).put(key, sums(pi).getOrElse(key, 0.0) + r.target)
        counts(pi).put(key, counts(pi).getOrElse(key, 0L) + 1L)
        pi += 1
      }
    }
    val facts = mutable.ArrayBuffer.empty[Fact]
    val maps  = ps.indices.map { pi =>
      val m = new mutable.LongMap[Int]()
      // Sort keys for deterministic fact ids.
      counts(pi).keys.toArray.sorted.foreach { key =>
        val p = ps(pi)
        val values = new Array[Int](p.length)
        var rest = key
        var i = 0
        while (i < p.length) {
          values(i) = (rest % cards(p(i))).toInt
          rest /= cards(p(i))
          i += 1
        }
        val cnt = counts(pi)(key)
        m.put(key, facts.length)
        facts += Fact(p, values, sums(pi)(key) / cnt, cnt)
      }
      m
    }
    new FactIndex(rel, ps, strides, maps, facts.toIndexedSeq)
  }
}

/** Candidate facts of a relation, indexed by scope pattern ("fact group" in
  * Alg. 3) for O(1) lookup of the fact a given row falls under.
  */
final class FactIndex(
    val rel: EncodedRelation,
    val patterns: IndexedSeq[Array[Int]],
    strides: IndexedSeq[Array[Long]],
    maps: IndexedSeq[mutable.LongMap[Int]],
    val facts: IndexedSeq[Fact]) {

  val numFacts: Int = facts.length
  val numPatterns: Int = patterns.length

  /** Fact id of the (unique) fact in group `pi` whose scope contains `r`. */
  def factIdFor(pi: Int, r: EncodedRow): Int =
    maps(pi)(FactIndex.keyOf(patterns(pi), strides(pi), r))

  /** Number of facts in group `pi` — M(g) of §VI-C. */
  def groupSize(pi: Int): Int = maps(pi).size

  /** Fact ids belonging to group `pi`. */
  def groupFacts(pi: Int): IndexedSeq[Int] = maps(pi).values.toIndexedSeq.sorted

  /** Whether group `a`'s pattern is a subset of group `b`'s — i.e. `b`
    * specializes `a` (restricts a superset of dimensions, Alg. 3 line 19).
    */
  def isSpecialization(a: Int, b: Int): Boolean = {
    val pa = patterns(a); val pb = patterns(b)
    pa.forall(pb.contains)
  }
}

object FactIndex {
  private[core] def keyOf(pattern: Array[Int], stride: Array[Long], r: EncodedRow): Long = {
    var key = 0L
    var i = 0
    while (i < pattern.length) { key += r.dims(pattern(i)) * stride(i); i += 1 }
    key
  }
}
