package repro.system

import org.apache.spark.sql.Dataset

/** Run-time query answering (§III): map a voice query — target column plus
  * equality predicates — to the best pre-generated speech.
  *
  * Exact match first; otherwise, among all speeches for the queried target,
  * the one describing the most specific data subset *containing* the query's
  * subset: predicates `S ⊆ Q` with maximal `|S ∩ Q| = |S|`.
  */
final class QueryEngine(summaries: Seq[Summary]) {

  private val byKey: Map[String, Summary] =
    summaries.map(s => s.key -> s).toMap
  private val byTarget: Map[String, Seq[Summary]] =
    summaries.groupBy(_.target)

  def size: Int = summaries.size

  /** Exact lookup only. */
  def exact(target: String, predicates: Map[String, String]): Option[Summary] =
    byKey.get(Problem.key(target, predicates))

  /** Lookup with most-specific-subset fallback. */
  def lookup(target: String, predicates: Map[String, String]): Option[Summary] =
    exact(target, predicates).orElse {
      byTarget.getOrElse(target, Nil)
        .filter(s => s.predicates.toSet.subsetOf(predicates.toSet))
        .sortBy(s => (-s.predicates.size, s.key))
        .headOption
    }
}

object QueryEngine {
  /** Load a materialized summaries table (e.g. read back from Parquet). */
  def fromDataset(ds: Dataset[Summary]): QueryEngine =
    new QueryEngine(ds.collect().toIndexedSeq)
}
