package repro.core

import repro.ml.KMeans
import repro.util.Rnd

/** Example-selection strategies for the AL loop (paper §2.3 and §4.7). */
sealed trait Strategy { def name: String }
case object RandomSel extends Strategy { val name = "Random" }
case object GreedySel extends Strategy { val name = "Greedy" }
case object UncertaintySel extends Strategy { val name = "Uncertainty" }
case object Partition2 extends Strategy { val name = "Partition-2" }
case object Partition4 extends Strategy { val name = "Partition-4" }
case object QbcSel extends Strategy { val name = "QBC" }
case object BadgeSel extends Strategy { val name = "BADGE" }

/** A candidate pair with its blocker distance and matcher probability. */
final case class ScoredCand(rId: Int, sId: Int, dist: Double, prob: Double)

/** Context a selector may need beyond the scored candidates. */
final case class SelectorCtx(
    rng: Rnd.Gen,
    /** BADGE gradient embedding of a candidate pair. */
    gradEmbedding: ScoredCand => Array[Double],
    /** QBC: probabilities from a bootstrap committee of matchers, one array
      * (aligned with the candidate sequence) per committee member.
      */
    bootstrapProbs: IndexedSeq[ScoredCand] => IndexedSeq[Array[Double]],
)

object Selectors {

  /** Binary entropy (paper Eq. 4), the uncertainty measure. */
  def entropy(p: Double): Double = {
    val q = math.min(math.max(p, 1e-12), 1.0 - 1e-12)
    -q * math.log(q) - (1 - q) * math.log(1 - q)
  }

  /** Select up to `b` pairs from `cands` (already filtered of labeled/test
    * pairs by the caller). Returns pairs in selection order.
    */
  def select(strategy: Strategy, cands: IndexedSeq[ScoredCand], b: Int,
             ctx: SelectorCtx): IndexedSeq[(Int, Int)] = {
    if (cands.isEmpty) return IndexedSeq.empty
    val budget = math.min(b, cands.length)
    strategy match {
      case RandomSel =>
        ctx.rng.sampleDistinct(cands.length, budget).map(i => key(cands(i))).toIndexedSeq

      case GreedySel => // most similar pairs: smallest ℓ2 distance
        cands.sortBy(_.dist).take(budget).map(key)

      case UncertaintySel =>
        cands.sortBy(c => -entropy(c.prob)).take(budget).map(key)

      case Partition2 =>
        // least-confident (highest-entropy) positives and negatives, half each
        val (pos, neg) = cands.partition(_.prob > 0.5)
        val posSorted = pos.sortBy(c => -entropy(c.prob))
        val negSorted = neg.sortBy(c => -entropy(c.prob))
        interleaveTake(posSorted, negSorted, budget).map(key)

      case Partition4 =>
        // quarters: high/low-confidence positives and negatives; all four
        // sets are sent to the labeler (the paper's AL-compatible variant)
        val (pos, neg) = cands.partition(_.prob > 0.5)
        val posByConf = pos.sortBy(c => entropy(c.prob)) // confident first
        val negByConf = neg.sortBy(c => entropy(c.prob))
        val q = math.max(1, budget / 4)
        val phc = posByConf.take(q)
        val plc = posByConf.reverse.take(q)
        val nhc = negByConf.take(q)
        val nlc = negByConf.reverse.take(q)
        (phc ++ plc ++ nhc ++ nlc).map(key).distinct.take(budget) match {
          case sel if sel.length < budget =>
            // fill any shortfall with globally least-confident pairs
            val have = sel.toSet
            sel ++ cands.sortBy(c => -entropy(c.prob)).map(key)
              .filterNot(have.contains).take(budget - sel.length)
          case sel => sel
        }

      case QbcSel =>
        // soft disagreement: entropy of the bootstrap committee's mean prob
        val probs = ctx.bootstrapProbs(cands)
        require(probs.nonEmpty, "QBC needs at least one bootstrap member")
        val score = cands.indices.map { i =>
          val mean = probs.map(_(i)).sum / probs.length
          entropy(mean)
        }
        cands.indices.sortBy(i => -score(i)).take(budget).map(i => key(cands(i))).toIndexedSeq

      case BadgeSel =>
        val gs = cands.map(ctx.gradEmbedding)
        val seeds = KMeans.ppSeeds(gs, budget, ctx.rng.nextLong())
        seeds.map(i => key(cands(i))).toIndexedSeq
    }
  }

  private def key(c: ScoredCand): (Int, Int) = (c.rId, c.sId)

  /** Take alternately from two ranked lists until `n` collected. */
  private def interleaveTake(a: IndexedSeq[ScoredCand], b: IndexedSeq[ScoredCand],
                             n: Int): IndexedSeq[ScoredCand] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[ScoredCand]
    var i = 0
    while (out.length < n && (i < a.length || i < b.length)) {
      if (i < a.length && out.length < n) out += a(i)
      if (i < b.length && out.length < n) out += b(i)
      i += 1
    }
    out.toIndexedSeq
  }
}
