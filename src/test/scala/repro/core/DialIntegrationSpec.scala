package repro.core

import repro.SparkSpec
import repro.data.ERDataGen

/** End-to-end mini AL runs exercising Algorithm 1 and every blocking mode. */
class DialIntegrationSpec extends SparkSpec {
  private lazy val ds = ERDataGen.amazonGoogle(scale = 0.12)
  private val fastCfg = DialConfig(rounds = 1, budget = 16, seedPos = 12, seedNeg = 12,
                                   matcherEpochs = 6, blockerEpochs = 12, embedDim = 32)

  test("seed set has the requested composition and avoids the test split") {
    val dial = new Dial(spark, ds, fastCfg)
    val seed = dial.seedSet()
    assert(seed.count(_.y) == 12)
    assert(seed.count(!_.y) == 12)
    seed.foreach { lp =>
      assert(lp.y == ds.dups.contains((lp.rId, lp.sId)))
      assert(!ds.testSet.contains((lp.rId, lp.sId)))
    }
    assert(seed.map(lp => (lp.rId, lp.sId)).distinct.size == seed.size)
  }

  test("DIAL run completes with consistent bookkeeping") {
    val r = new Dial(spark, ds, fastCfg).run()
    assert(r.method == "DIAL")
    assert(r.roundStats.length == fastCfg.rounds + 1)
    assert(r.nLabeled == 24 + fastCfg.rounds * fastCfg.budget)
    assert(r.candRecall >= 0.0 && r.candRecall <= 100.0)
    assert(r.allPRF.tp + r.allPRF.fn == ds.dups.size)
    assert(r.findAllSec > 0.0)
    assert(r.roundStats.last.nLabeled == r.nLabeled)
  }

  test("labeled set grows by the budget each round") {
    val r = new Dial(spark, ds, fastCfg.copy(rounds = 2)).run()
    assert(r.roundStats.map(_.nLabeled) == IndexedSeq(24, 24 + 16, 24 + 32))
  }

  test("active learning improves all-pairs F1 over the first round") {
    val r = new Dial(spark, ds, fastCfg.copy(rounds = 2, budget = 32,
                                             matcherEpochs = 12, blockerEpochs = 30)).run()
    assert(r.roundStats.last.allF1 >= r.roundStats.head.allF1 - 8.0,
      s"F1 collapsed: ${r.roundStats.map(_.allF1)}")
  }

  test("PairedFixed keeps a fixed candidate recall across rounds") {
    val r = new Dial(spark, ds, fastCfg.copy(rounds = 2, blockerMode = PairedFixedMode)).run()
    assert(r.roundStats.map(_.candRecall).distinct.size == 1)
  }

  test("all blocking modes run end-to-end") {
    Seq(PairedAdaptMode, SentenceBertMode, RulesMode).foreach { mode =>
      val r = new Dial(spark, ds, fastCfg.copy(blockerMode = mode)).run()
      assert(r.method == mode.name)
      assert(r.roundStats.nonEmpty, mode.name)
    }
  }

  test("run is deterministic in config seed (metrics, not timings)") {
    def strip(r: RunResult) = (r.roundStats, r.candRecall, r.testPRF, r.allPRF, r.nLabeled)
    val a = new Dial(spark, ds, fastCfg).run()
    val b = new Dial(spark, ds, fastCfg).run()
    assert(strip(a) == strip(b))
  }

  test("different selectors select different labels but all complete") {
    Seq(RandomSel, GreedySel, Partition2, BadgeSel).foreach { st =>
      val r = new Dial(spark, ds, fastCfg.copy(selector = st)).run()
      assert(r.nLabeled == 24 + fastCfg.budget, st.name)
    }
  }

  test("candSizeOverride caps the candidate set") {
    val r = new Dial(spark, ds, fastCfg.copy(candSizeOverride = Some(40)))
    assert(r.candSize == 40)
  }

  test("multilingual seed construction via pretrained NN probing works") {
    val ml = ERDataGen.multilingual(120, 40, seed = 3)
    val dial = new Dial(spark, ml, fastCfg.copy(trainG = false, seedPos = 8, seedNeg = 8))
    val seed = dial.seedSet()
    assert(seed.count(_.y) == 8)
    assert(seed.count(!_.y) == 8)
  }

  test("timedFindAll returns a positive duration and scales to N=4") {
    val sec = new Dial(spark, ds, fastCfg).timedFindAll(2)
    assert(sec > 0.0)
  }
}
