package repro.jobs

import repro.core._
import repro.data.ERDataGen
import repro.index.ExactIndex
import repro.ml.Vec
import repro.text.Tokenizer

/** Prints full-scale rules recall vs pretrained-identity CAND recall. */
object ProbeJob {
  def main(args: Array[String]): Unit = JobMain.withSpark("probe") { spark =>
    (ERDataGen.benchmarks(1.0) :+ ERDataGen.multilingualDefault(scale = 1.0)).foreach { ds =>
      val embedder = Dial.embedderFor(ds, 64)
      val (k, candSize) =
        if (ds.name == "Abt-Buy") (20, 20 * ds.s.size) else (3, 3 * ds.s.size)
      def recallWith(rVecs: Array[Array[Double]], sVecs: Array[Array[Double]]): Double = {
        val idx = new ExactIndex(Array.tabulate(ds.r.size)(identity), rVecs)
        val best = scala.collection.mutable.HashMap.empty[(Int, Int), Double]
        ds.s.indices.foreach { sId =>
          idx.search(sVecs(sId), k).foreach { case (rId, dd) => best((rId, sId)) = dd }
        }
        Metrics.candRecall(best.toSeq.sortBy(_._2).take(candSize).map(_._1), ds.dups)
      }
      val idRecall = recallWith(embedder.rBase, embedder.sBase)
      // oracle de-filler: embed only rare tokens (df <= 5% of corpus)
      val df = scala.collection.mutable.HashMap.empty[String, Int]
      (ds.r ++ ds.s).foreach(_.tokenSet.foreach(t => df(t) = df.getOrElse(t, 0) + 1))
      val cut = 0.05 * (ds.r.size + ds.s.size)
      def rareVec(rec: repro.data.Rec): Array[Double] = {
        val toks = Tokenizer.recordTokens(rec.attrs).filter(t => df(t) <= cut)
        if (toks.isEmpty) Vec.zeros(embedder.d)
        else {
          val out = Vec.zeros(embedder.d)
          toks.foreach(t => Vec.axpyI(out, 1.0 / toks.length, embedder.emb.tokenVec(t)))
          val n = Vec.l2(out); if (n > 1e-12) Vec.scaleI(out, 1.0 / n)
          out
        }
      }
      val oracleRecall = recallWith(ds.r.map(rareVec).toArray, ds.s.map(rareVec).toArray)
      println(f"[probe] ${ds.name}%-16s oracle-defiller=$oracleRecall%5.1f")
      val rules = if (ds.germanToEnglish.nonEmpty) IndexedSeq.empty else Dial.rulesFor(spark, ds)
      val rulesRecall = if (rules.isEmpty) -1.0 else Metrics.candRecall(rules, ds.dups)
      println(f"[probe] ${ds.name}%-16s identity=$idRecall%5.1f rules=$rulesRecall%5.1f |rules|=${rules.size}%8d candSize=$candSize%7d")
    }
  }
}
