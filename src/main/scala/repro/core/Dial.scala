package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.col
import repro.data.ERDataset
import repro.index.{EmbView, ExactIndex, SparkKnn}
import repro.rules.RulesBlocker
import repro.text.HashEmbedding
import repro.util.Rnd
import scala.collection.mutable

/** Which blocking strategy feeds the candidate set (paper §4.3). */
sealed trait BlockerMode { def name: String }
case object IbcMode extends BlockerMode { val name = "DIAL" }
case object PairedFixedMode extends BlockerMode { val name = "PairedFixed" }
case object PairedAdaptMode extends BlockerMode { val name = "PairedAdapt" }
case object SentenceBertMode extends BlockerMode { val name = "SentenceBERT" }
case object RulesMode extends BlockerMode { val name = "Rules" }

/** Full configuration of one AL run. Defaults follow the paper (§4.2),
  * rescaled to container size per DESIGN.md §4.
  */
final case class DialConfig(
    blockerMode: BlockerMode = IbcMode,
    committeeN: Int = 3,
    maskP: Double = 0.75,
    k: Int = 3,
    candMult: Double = 3.0,
    candSizeOverride: Option[Int] = None,
    rounds: Int = 4,
    budget: Int = 128,
    seedPos: Int = 64,
    seedNeg: Int = 64,
    objective: Objective = Contrastive,
    negMode: NegMode = RandomNegs,
    selector: Strategy = UncertaintySel,
    matcherEpochs: Int = 20,
    blockerEpochs: Int = 150,
    trainG: Boolean = true,
    embedDim: Int = 64,
    seed: Long = 7,
)

/** Wall-clock (seconds) of the operations of one AL round (paper Table 9). */
final case class OpTimes(matcherSec: Double, committeeSec: Double,
                         retrieveSec: Double, selectSec: Double)

/** Quantities tracked per round (the progressive curves of Figures 4–7). */
final case class RoundStat(round: Int, nLabeled: Int, candRecall: Double,
                           testF1: Double, allF1: Double)

/** Outcome of one full AL run. */
final case class RunResult(
    method: String, dsName: String,
    roundStats: IndexedSeq[RoundStat],
    candRecall: Double,
    testPRF: PRF, allPRF: PRF,
    lastTimes: OpTimes,
    findAllSec: Double,
    nLabeled: Int,
)

/** DIAL's active-learning loop (Algorithm 1) plus every baseline blocking
  * mode, sharing the matcher, selector and evaluation machinery so that the
  * comparisons isolate exactly the blocking strategy, as in the paper.
  *
  * Labels come from the gold oracle. After `cfg.rounds` labeling rounds a
  * final train + block + match pass produces the end-of-AL evaluation.
  */
final class Dial(spark: SparkSession, val ds: ERDataset, val cfg: DialConfig) {

  val embedder: Embedder = Dial.embedderFor(ds, cfg.embedDim)
  val emb: HashEmbedding = embedder.emb
  val candSize: Int = cfg.candSizeOverride.getOrElse((cfg.candMult * ds.s.size).toInt)
  private val d = cfg.embedDim
  private val rng = new Rnd.Gen(Rnd.combine(cfg.seed, Rnd.hash64(ds.name)))

  private val scalarCache = mutable.HashMap.empty[(Int, Int), Array[Double]]

  private def scalars(rId: Int, sId: Int): Array[Double] =
    scalarCache.getOrElseUpdate((rId, sId),
      embedder.featurizer.scalars(ds.rById(rId).attrs, ds.sById(sId).attrs))

  private def trainEx(lp: LabeledPair): TrainEx =
    TrainEx(embedder.rBase(lp.rId), embedder.sBase(lp.sId),
            scalars(lp.rId, lp.sId), if (lp.y) 1.0 else 0.0)

  // ------------------------------------------------------------- seed set

  /** Inverted token index over R for hard-negative seed sampling. */
  private lazy val tokenIndex: Map[String, IndexedSeq[Int]] = {
    val m = mutable.HashMap.empty[String, mutable.ArrayBuffer[Int]]
    ds.r.foreach(rec => rec.tokenSet.foreach(t => m.getOrElseUpdate(t, mutable.ArrayBuffer.empty) += rec.id))
    m.view.mapValues(_.toIndexedSeq).toMap
  }

  /** Initial labeled seed T: `seedPos` duplicates and `seedNeg` negatives
    * sampled outside the test split. For the multilingual dataset the seed
    * is built by probing a pretrained-embedding index, as in §4.5.
    */
  def seedSet(): IndexedSeq[LabeledPair] = {
    if (ds.germanToEnglish.nonEmpty) return multilingualSeed()
    val dupSeq = ds.dups.toIndexedSeq.sorted.filterNot(ds.testSet.contains)
    val pos = rng.sampleDistinct(dupSeq.length, math.min(cfg.seedPos, dupSeq.length))
      .map(dupSeq).map { case (a, b) => LabeledPair(a, b, y = true) }
    val negs = mutable.LinkedHashSet.empty[(Int, Int)]
    var attempts = 0
    while (negs.size < cfg.seedNeg && attempts < cfg.seedNeg * 200) {
      attempts += 1
      val s = ds.s(rng.nextInt(ds.s.size))
      val hard = negs.size % 2 == 0
      val rIdOpt =
        if (hard) {
          val toks = s.tokenSet.toIndexedSeq
          if (toks.isEmpty) None
          else tokenIndex.get(toks(rng.nextInt(toks.length)))
            .map(ids => ids(rng.nextInt(ids.length)))
        } else Some(rng.nextInt(ds.r.size))
      rIdOpt.foreach { rId =>
        val pair = (rId, s.id)
        if (!ds.dups.contains(pair) && !ds.testSet.contains(pair)) negs += pair
      }
    }
    (pos.toIndexedSeq ++ negs.toIndexedSeq.map { case (a, b) => LabeledPair(a, b, y = false) })
  }

  /** §4.5 seed construction: probe a pretrained-embedding index with every s,
    * split retrieved pairs by gold, sample 50/50.
    */
  private def multilingualSeed(): IndexedSeq[LabeledPair] = {
    val idx = new ExactIndex(Array.tabulate(ds.r.size)(identity), embedder.rBase)
    val retrieved = ds.s.indices.flatMap { sId =>
      idx.search(embedder.sBase(sId), 3).map { case (rId, _) => (rId, sId) }
    }.filterNot(ds.testSet.contains)
    val (dup, non) = retrieved.partition(ds.dups.contains)
    val pos = rng.sampleDistinct(dup.length, math.min(cfg.seedPos, dup.length))
      .map(dup).map { case (a, b) => LabeledPair(a, b, y = true) }
    val neg = rng.sampleDistinct(non.length, math.min(cfg.seedNeg, non.length))
      .map(non).map { case (a, b) => LabeledPair(a, b, y = false) }
    pos.toIndexedSeq ++ neg
  }

  // ------------------------------------------------------------- training

  private def trainMatcher(t: IndexedSeq[LabeledPair], round: Int,
                           epochs: Int): Matcher = {
    // re-initialised from "pretrained weights" every round, as in §4.2
    val m = new Matcher(d, Rnd.combine(cfg.seed, 100 + round))
    val data = t.map(trainEx)
    m.train(data, epochs, batch = 16, new Rnd.Gen(Rnd.combine(cfg.seed, 200 + round)),
            trainG = cfg.trainG)
    m
  }

  private def trainCommittee(t: IndexedSeq[LabeledPair], matcher: Matcher,
                             round: Int, n: Int, objective: Objective,
                             negMode: NegMode): Committee = {
    val com = Committee.init(n, d, cfg.maskP,
      Rnd.combine(cfg.seed, 300 + round) + (if (cfg.blockerMode == SentenceBertMode) 17 else 0))
    val g = matcher.g
    val pos = t.filter(_.y).map(lp => (embedder.adaptedR(lp.rId, g), embedder.adaptedS(lp.sId, g)))
    val negs = t.filterNot(_.y).map(lp => (embedder.adaptedR(lp.rId, g), embedder.adaptedS(lp.sId, g)))
    val rPool = ds.r.indices.map(i => embedder.adaptedR(i, g))
    val sPool = ds.s.indices.map(i => embedder.adaptedS(i, g))
    Committee.train(com,
      Committee.TrainConfig(objective = objective, negMode = negMode, epochs = cfg.blockerEpochs),
      pos, rPool, sPool, negs, new Rnd.Gen(Rnd.combine(cfg.seed, 400 + round)))
    com
  }

  // ------------------------------------------------------------ retrieval

  @transient private var sDfCache: DataFrame = _
  private def sDf: DataFrame = {
    if (sDfCache == null) { sDfCache = ds.sDF(spark).cache(); sDfCache.count() }
    sDfCache
  }

  /** Memoized fixed candidate sets (PairedFixed / Rules do not change). */
  private var fixedCand: Option[(IndexedSeq[CandPair], Double)] = None

  private def retrieve(matcher: Matcher, committee: Option[Committee]): (IndexedSeq[CandPair], Double) = {
    def timed(views: IndexedSeq[EmbView]): (IndexedSeq[CandPair], Double) = {
      val idx = Blocker.buildIndexes(embedder.rBase, views)
      val t0 = System.nanoTime()
      val kEff = cfg.k
      val cand = Blocker.retrieveCand(spark, ds, sDf, emb, views, idx, kEff, candSize)
      (cand, (System.nanoTime() - t0) / 1e9)
    }
    cfg.blockerMode match {
      case PairedFixedMode =>
        fixedCand match {
          case Some(c) => c
          case None =>
            val c = timed(IndexedSeq(new PlainView))
            fixedCand = Some(c); c
        }
      case PairedAdaptMode =>
        timed(IndexedSeq(new ScaleView(matcher.g)))
      case SentenceBertMode =>
        timed(IndexedSeq(new MemberView(matcher.g, committee.get.members.head)))
      case IbcMode =>
        timed(committee.get.members.map(m => new MemberView(matcher.g, m): EmbView))
      case RulesMode =>
        fixedCand match {
          case Some(c) => c
          case None =>
            val t0 = System.nanoTime()
            val pairs = Dial.rulesFor(spark, ds)
            val sec = (System.nanoTime() - t0) / 1e9
            val c = (pairs.map { case (a, b) => CandPair(a, b, 0.0) }, sec)
            fixedCand = Some(c); c
        }
    }
  }

  // -------------------------------------------------------------- scoring

  private def scoreCand(matcher: Matcher, cand: IndexedSeq[CandPair]): (IndexedSeq[ScoredCand], Double) = {
    if (cand.isEmpty) return (IndexedSeq.empty, 0.0)
    val t0 = System.nanoTime()
    val candDf = {
      import org.apache.spark.sql.types._
      val rows = cand.map(c => org.apache.spark.sql.Row(c.rId, c.sId))
      spark.createDataFrame(
        spark.sparkContext.parallelize(rows.toSeq, math.max(1, cand.size / 4000)),
        StructType(Array(StructField("rid", IntegerType, nullable = false),
                         StructField("sid", IntegerType, nullable = false))))
    }
    val rMap = ds.r.map(x => x.id -> x.attrs).toMap
    val sMap = ds.s.map(x => x.id -> x.attrs).toMap
    val scored = SparkKnn.scorePairs(spark, candDf, rMap, sMap, new MatcherScorer(emb, embedder.featurizer, matcher))
      .collect().map(r => ((r.getInt(0), r.getInt(1)), r.getDouble(2))).toMap
    val out = cand.map(c => ScoredCand(c.rId, c.sId, c.dist, scored((c.rId, c.sId))))
    (out, (System.nanoTime() - t0) / 1e9)
  }

  // ------------------------------------------------------------ selection

  private def selectorCtx(t: IndexedSeq[LabeledPair], matcher: Matcher, round: Int): SelectorCtx =
    SelectorCtx(
      rng = new Rnd.Gen(Rnd.combine(cfg.seed, 500 + round)),
      gradEmbedding = c => matcher.gradEmbedding(
        embedder.rBase(c.rId), embedder.sBase(c.sId), scalars(c.rId, c.sId)),
      bootstrapProbs = cands => {
        val boot = new Rnd.Gen(Rnd.combine(cfg.seed, 600 + round))
        (0 until 3).map { k =>
          val resampled = IndexedSeq.fill(t.length)(t(boot.nextInt(t.length)))
          val m = new Matcher(d, Rnd.combine(cfg.seed, 700 + round * 10 + k))
          m.train(resampled.map(trainEx), epochs = 8, batch = 16,
                  new Rnd.Gen(Rnd.combine(cfg.seed, 800 + round * 10 + k)), trainG = cfg.trainG)
          cands.map(c => m.prob(embedder.rBase(c.rId), embedder.sBase(c.sId),
                                scalars(c.rId, c.sId))).toArray
        }
      },
    )

  // ------------------------------------------------------------- the loop

  def run(): RunResult = {
    var t = seedSet()
    val labeledSet = mutable.LinkedHashSet.empty[(Int, Int)]
    t.foreach(lp => labeledSet += ((lp.rId, lp.sId)))
    val stats = mutable.ArrayBuffer.empty[RoundStat]
    var lastTimes = OpTimes(0, 0, 0, 0)
    var findAllSec = 0.0
    var finalTest = PRF(0, 0, 0); var finalAll = PRF(0, 0, 0); var finalRecall = 0.0

    var round = 1
    val totalRounds = cfg.rounds + 1 // labeling rounds + final evaluation pass
    while (round <= totalRounds) {
      val isFinal = round == totalRounds
      Console.err.println(s"[dial] ${ds.name} ${cfg.blockerMode.name} round=$round " +
        s"|T|=${t.length} |T_p|=${t.count(_.y)}")
      val tm0 = System.nanoTime()
      val matcher = trainMatcher(t, round, cfg.matcherEpochs)
      val matcherSec = (System.nanoTime() - tm0) / 1e9

      val tc0 = System.nanoTime()
      val committee = cfg.blockerMode match {
        case IbcMode =>
          Some(trainCommittee(t, matcher, round, cfg.committeeN, cfg.objective, cfg.negMode))
        case SentenceBertMode =>
          Some(trainCommitteeSbert(t, matcher, round))
        case _ => None
      }
      val committeeSec = (System.nanoTime() - tc0) / 1e9

      val (cand, retrieveSec) = retrieve(matcher, committee)
      val (scored, scoreSec) = scoreCand(matcher, cand)

      val predicted = scored.filter(_.prob > 0.5).map(c => (c.rId, c.sId)).toSet
      val recall = Metrics.candRecall(cand.map(c => (c.rId, c.sId)), ds.dups)
      val testPRF = Metrics.testEval(ds.testPairs, predicted)
      val allPRF = Metrics.allPairs(predicted, ds.dups)
      stats += RoundStat(round, t.length, recall, testPRF.f1, allPRF.f1)

      if (!isFinal) {
        val ts0 = System.nanoTime()
        val selectable = scored.filterNot { c =>
          labeledSet.contains((c.rId, c.sId)) || ds.testSet.contains((c.rId, c.sId))
        }
        val sel = Selectors.select(cfg.selector, selectable, cfg.budget,
                                   selectorCtx(t, matcher, round))
        val selectSec = (System.nanoTime() - ts0) / 1e9
        val newly = sel.map { case (a, b) => LabeledPair(a, b, ds.dups.contains((a, b))) }
        t = t ++ newly
        newly.foreach(lp => labeledSet += ((lp.rId, lp.sId)))
        // Table 9 semantics: "Selection" includes the matcher inference over
        // CAND that feeds the uncertainty scores; retrieval is pure IBC.
        lastTimes = OpTimes(matcherSec, committeeSec, retrieveSec, scoreSec + selectSec)
      } else {
        finalTest = testPRF; finalAll = allPRF; finalRecall = recall
        findAllSec = retrieveSec + scoreSec
      }
      round += 1
    }
    cleanup()
    RunResult(cfg.blockerMode.name, ds.name, stats.toIndexedSeq, finalRecall,
              finalTest, finalAll, lastTimes, findAllSec, t.length)
  }

  private def trainCommitteeSbert(t: IndexedSeq[LabeledPair], matcher: Matcher, round: Int): Committee = {
    // SentenceBERT baseline: a single full-dimension head trained with the
    // classification objective on the actively-labeled data T (see §4.3).
    val com = Committee.init(1, d, maskP = 1.0, Rnd.combine(cfg.seed, 900 + round))
    val g = matcher.g
    val pos = t.filter(_.y).map(lp => (embedder.adaptedR(lp.rId, g), embedder.adaptedS(lp.sId, g)))
    val negs = t.filterNot(_.y).map(lp => (embedder.adaptedR(lp.rId, g), embedder.adaptedS(lp.sId, g)))
    val rPool = ds.r.indices.map(i => embedder.adaptedR(i, g))
    val sPool = ds.s.indices.map(i => embedder.adaptedS(i, g))
    Committee.train(com,
      Committee.TrainConfig(objective = Classification, negMode = LabeledNegs,
                            epochs = cfg.blockerEpochs),
      pos, rPool, sPool, negs, new Rnd.Gen(Rnd.combine(cfg.seed, 950 + round)))
    com
  }

  /** One timed "find all duplicates" pass at a given committee size, after a
    * single training on the seed set (paper Table 10: testing time vs N).
    */
  def timedFindAll(n: Int): Double = {
    val t = seedSet()
    val matcher = trainMatcher(t, round = 1, cfg.matcherEpochs)
    val committee = trainCommittee(t, matcher, round = 1, n, cfg.objective, cfg.negMode)
    val views = committee.members.map(m => new MemberView(matcher.g, m): EmbView)
    val idx = Blocker.buildIndexes(embedder.rBase, views)
    val t0 = System.nanoTime()
    val cand = Blocker.retrieveCand(spark, ds, sDf, emb, views, idx, cfg.k, candSize)
    val (_, scoreSec) = scoreCand(matcher, cand)
    val retrieveSec = (System.nanoTime() - t0) / 1e9 - scoreSec
    cleanup()
    retrieveSec + scoreSec
  }

  private def cleanup(): Unit = {
    if (sDfCache != null) { sDfCache.unpersist(); sDfCache = null }
  }
}

object Dial {
  private val embedders = mutable.HashMap.empty[(String, Int, Int, Int), Embedder]
  private val rulesCache = mutable.HashMap.empty[(String, Int, Int), IndexedSeq[(Int, Int)]]

  /** Base embeddings are a pure function of (dataset, dim) — share across runs. */
  def embedderFor(ds: ERDataset, dim: Int): Embedder = synchronized {
    embedders.getOrElseUpdate((ds.name, ds.r.size, ds.s.size, dim),
      new Embedder(new HashEmbedding(dim, 42L, ds.germanToEnglish), ds))
  }

  /** Rule candidate sets are fixed per dataset — share across runs. */
  def rulesFor(spark: SparkSession, ds: ERDataset): IndexedSeq[(Int, Int)] = synchronized {
    rulesCache.getOrElseUpdate((ds.name, ds.r.size, ds.s.size),
      RulesBlocker.candidates(spark, ds))
  }
}
