package repro.system

import repro.data.VoiceData.DatasetSpec

/** The paper's Configuration file (§III): which table to pre-process, which
  * columns are dimensions, which are targets, and the enumeration limits.
  *
  * @param dataset          table metadata (dims + targets)
  * @param maxQueryLen      maximal number of equality predicates per query
  * @param maxExtraFactDims extra dimensions a fact may restrict beyond the
  *                         query predicates (paper default: 2)
  * @param speechLength     facts per speech m (paper default: 3 — user
  *                         retention drops sharply after three facts [27])
  */
final case class SummarizationConfig(
    dataset: DatasetSpec,
    maxQueryLen: Int = 2,
    maxExtraFactDims: Int = 2,
    speechLength: Int = 3) {
  require(maxQueryLen >= 0 && maxExtraFactDims >= 0 && speechLength >= 1)
}

/** One pre-processing unit of work: a voice query, i.e. a target column plus
  * a conjunction of equality predicates on dimension columns (§III).
  */
final case class Problem(target: String, predicates: Seq[(String, String)]) {
  /** Canonical lookup key — predicate order must not matter. */
  def key: String = Problem.key(target, predicates.toMap)
}

object Problem {
  def key(target: String, predicates: Map[String, String]): String =
    target + "|" + predicates.toSeq.sorted.map { case (d, v) => s"$d=$v" }.mkString(",")
}
