package repro.jobs

import repro.core._
import repro.data.{ERDataGen, ERDataset}
import repro.index.ExactIndex
import repro.util.Rnd

/** Offline committee-hyperparameter sweep (no Spark needed): measures CAND
  * recall of the trained committee vs the identity baseline on the datasets
  * where blocker learning must earn its keep (multilingual, Abt-Buy, W-A).
  */
object TuneJob {

  private def candRecall(ds: ERDataset, embedder: Embedder, g: Array[Double],
                         views: IndexedSeq[repro.index.EmbView], k: Int, candSize: Int): Double = {
    val idxs = views.map(v => new ExactIndex(Array.tabulate(ds.r.size)(identity),
                                             embedder.rBase.map(e => v(repro.ml.Vec.had(g, e)))))
    // NOTE: views already include the g-scale; avoid double-scaling by passing identity here.
    val best = scala.collection.mutable.HashMap.empty[(Int, Int), Double]
    ds.s.indices.foreach { sId =>
      views.indices.foreach { m =>
        val q = views(m)(repro.ml.Vec.had(g, embedder.sBase(sId)))
        idxs(m).search(q, k).foreach { case (rId, dd) =>
          val key = (rId, sId)
          if (!best.contains(key) || best(key) > dd) best(key) = dd
        }
      }
    }
    val cand = best.toSeq.sortBy(_._2).take(candSize).map(_._1)
    Metrics.candRecall(cand, ds.dups)
  }

  def main(args: Array[String]): Unit = {
    val scale = 1.0
    val cases: Seq[(ERDataset, Int, Int)] = Seq(
      (ERDataGen.walmartAmazon(scale = scale), 3, 3),
    )
    cases.foreach { case (ds, k, candMult) =>
      val embedder = Dial.embedderFor(ds, 64)
      val candSize = candMult * ds.s.size
      val rng = new Rnd.Gen(7)
      val dupSeq = ds.dups.toIndexedSeq.sorted
      val g = Array.fill(64)(1.0)
      // rank dups by corruption (token overlap ascending = most corrupted first)
      val byCorrupt = dupSeq.sortBy { case (a, b) =>
        repro.text.Tokenizer.overlap(ds.rById(a).tokenSet, ds.sById(b).tokenSet) }
      val uni64 = rng.sampleDistinct(dupSeq.size, 64).map(dupSeq).toIndexedSeq
      val posSets: Seq[(String, IndexedSeq[(Int, Int)])] = Seq(
        "uniform200" -> rng.sampleDistinct(dupSeq.size, 200).map(dupSeq).toIndexedSeq,
        "uniform130" -> rng.sampleDistinct(dupSeq.size, 130).map(dupSeq).toIndexedSeq,
        "uniform64 " -> uni64,
        "64u+130hard" -> (uni64 ++ byCorrupt.take(130)).distinct,
      )
      val pos0 = posSets.head._2
      val posEmb = pos0.map { case (a, b) => (embedder.rBase(a), embedder.sBase(b)) }
      val rPool = ds.r.indices.map(i => embedder.rBase(i))
      val sPool = ds.s.indices.map(i => embedder.sBase(i))

      val idView = IndexedSeq[repro.index.EmbView](new PlainView)
      val baseRecall = candRecall(ds, embedder, g, idView, k, candSize)
      println(f"\n=== ${ds.name} (|R|=${ds.r.size} |S|=${ds.s.size}) identity recall: $baseRecall%5.1f")

      posSets.foreach { case (label, posPairs) =>
        val pe = posPairs.map { case (a, b) => (embedder.rBase(a), embedder.sBase(b)) }
        val com = Committee.init(3, 64, 0.75, seed = 11)
        Committee.train(com, Committee.TrainConfig(epochs = 150, lr = 0.01),
          pe, rPool, sPool, IndexedSeq.empty, new Rnd.Gen(13))
        val rec = candRecall(ds, embedder, g, com.members.map(m =>
          new repro.index.EmbView { def apply(e: Array[Double]) = m.encode(e) }), k, candSize)
        println(f"posSet=$label%-12s n=${posPairs.size}%4d -> recall $rec%5.1f  (identity $baseRecall%5.1f)")
      }
    }
  }
}
