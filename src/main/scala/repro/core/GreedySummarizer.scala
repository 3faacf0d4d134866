package repro.core

import scala.collection.mutable

/** Counters describing the work a summarization run performed — used by the
  * benches to show where pruning saves passes over the data.
  *
  * @param utilityPasses number of per-group utility computations (the paper's
  *                      fact–row joins, Alg. 2 line 7 / Alg. 3 lines 9 & 24)
  * @param boundPasses   number of per-group deviation-mass bound computations
  *                      (Alg. 3 line 15 — group-by without join)
  * @param prunedGroups  fact groups skipped thanks to bound pruning
  */
final case class SolveStats(utilityPasses: Int, boundPasses: Int, prunedGroups: Int)

/** Mutable state of a greedy run: per-row current deviation (equivalently the
  * user-expectation column of Alg. 2 line 11) plus pass primitives shared by
  * all fact-selection strategies.
  */
final class SummarizerState(val index: FactIndex, val prior: Double) {
  private val rel = index.rel

  /** Current per-row deviation |E(F,r) − v_r|; initialized from the prior. */
  val dev: Array[Double] = rel.rows.map(r => math.abs(prior - r.target))

  /** D(∅): accumulated deviation under the prior alone. */
  val baseError: Double = dev.sum

  var utilityPasses = 0
  var boundPasses = 0
  var prunedGroups = 0
  private val selected = mutable.ArrayBuffer.empty[Fact]

  def selectedFacts: IndexedSeq[Fact] = selected.toIndexedSeq
  def stats: SolveStats = SolveStats(utilityPasses, boundPasses, prunedGroups)

  /** Utility gain of every fact in group `pi` under the current expectations;
    * returns the (factId, gain) with maximal gain (−1 if the group is empty).
    * One pass over the rows — the analog of the paper's fact–row join.
    */
  def bestInGroup(pi: Int): (Int, Double) = {
    utilityPasses += 1
    val gains = new mutable.LongMap[Double]()
    val rows = rel.rows
    var ri = 0
    while (ri < rows.length) {
      val r = rows(ri)
      val fid = index.factIdFor(pi, r)
      val g = dev(ri) - math.abs(index.facts(fid).typical - r.target)
      if (g > 0) gains.put(fid, gains.getOrElse(fid.toLong, 0.0) + g)
      ri += 1
    }
    var bestId = -1
    var bestGain = 0.0
    // Deterministic tie-break on fact id.
    gains.toSeq.sortBy(_._1).foreach { case (fid, g) =>
      if (g > bestGain) { bestId = fid.toInt; bestGain = g }
    }
    (bestId, bestGain)
  }

  /** Upper bound on the utility gain of ANY fact in group `pi` (and of any
    * specialization): the maximal current deviation mass within one scope of
    * the group (Alg. 3 line 15) — adding a fact can at most zero the error in
    * its scope.
    */
  def groupBound(pi: Int): Double = {
    boundPasses += 1
    val mass = new mutable.LongMap[Double]()
    val rows = rel.rows
    var ri = 0
    while (ri < rows.length) {
      val fid = index.factIdFor(pi, rows(ri))
      mass.put(fid, mass.getOrElse(fid.toLong, 0.0) + dev(ri))
      ri += 1
    }
    if (mass.isEmpty) 0.0 else mass.values.max
  }

  /** Add `factId` to the speech and refresh per-row deviations (Alg. 2
    * line 11). Returns the realized utility gain.
    */
  def applyFact(factId: Int): Double = {
    val f = index.facts(factId)
    selected += f
    val rows = rel.rows
    var gain = 0.0
    var ri = 0
    while (ri < rows.length) {
      val r = rows(ri)
      if (f.inScope(r)) {
        val d = math.abs(f.typical - r.target)
        if (d < dev(ri)) { gain += dev(ri) - d; dev(ri) = d }
      }
      ri += 1
    }
    gain
  }
}

/** Strategy for Alg. 2 line 7: find the fact with globally maximal utility
  * gain. Implementations may prune fact groups but must stay exact, or the
  * greedy (1 − 1/e) guarantee is lost (§VI-A).
  */
trait FactSelectionStrategy {
  def selectBest(state: SummarizerState): (Int, Double)
}

/** G-B: compute utilities for every fact group exhaustively. */
object ExhaustiveSelection extends FactSelectionStrategy {
  def selectBest(state: SummarizerState): (Int, Double) = {
    var best = (-1, 0.0)
    var pi = 0
    while (pi < state.index.numPatterns) {
      val c = state.bestInGroup(pi)
      if (c._2 > best._2) best = c
      pi += 1
    }
    best
  }
}

/** Result of a greedy run.
  *
  * @param speech    selected facts with exact utility
  * @param gains     realized utility gain per iteration (non-increasing)
  * @param baseError D(∅) — for scaling utilities to one
  */
final case class GreedyResult(speech: Speech, gains: IndexedSeq[Double],
                              baseError: Double, stats: SolveStats)

/** Greedy speech construction (Alg. 2): iteratively add the fact with maximal
  * utility gain; guaranteed within (1 − 1/e) of the optimum (Thm 3).
  */
object GreedySummarizer {

  def summarize(index: FactIndex, m: Int, prior: Double,
                strategy: FactSelectionStrategy = ExhaustiveSelection): GreedyResult = {
    val state = new SummarizerState(index, prior)
    val gains = mutable.ArrayBuffer.empty[Double]
    var i = 0
    var exhausted = false
    while (i < m && !exhausted) {
      val (fid, gain) = strategy.selectBest(state)
      // A zero-gain best fact cannot improve utility; stop early.
      if (fid < 0 || gain <= 0) exhausted = true
      else { gains += state.applyFact(fid); i += 1 }
    }
    val utility = state.baseError - state.dev.sum
    GreedyResult(Speech(state.selectedFacts, utility), gains.toIndexedSeq,
      state.baseError, state.stats)
  }

  /** Convenience: build the fact index and run greedy on a relation. */
  def summarizeRelation(rel: EncodedRelation, maxFactDims: Int, m: Int,
                        strategy: FactSelectionStrategy = ExhaustiveSelection): GreedyResult = {
    val index = FactGen.build(rel, maxFactDims)
    summarize(index, m, rel.targetMean, strategy)
  }
}
