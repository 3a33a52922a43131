package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core._
import repro.data.{ERDataset, ERDatasets}
import repro.lsh._
import repro.nn.MLPClassifier

/** Harnesses for the LSH-blocking experiments (Section 5.4, Figures
  * 10–12): pair completeness / reduction ratio sweeps over K and L,
  * end-to-end precision/recall with the classifier applied to blocked
  * candidates (distributed), and multi-probe recall.
  */
object BlockingExperiments {
  import Experiments.fmtPct

  final case class BlockPrep(ds: ERDataset, drA: DataFrame, drB: DataFrame, dim: Int)

  def prepareBlocks(spark: SparkSession, ds: ERDataset): BlockPrep = {
    val dict = Dicts.gloveLike(ds.forms)
    def dr(df: DataFrame) =
      TupleEmbedder.withAvgVectors(spark, df, ds.attrs, dict).select("id", "vecs", "dr").cache()
    val a = dr(ds.tableA); val b = dr(ds.tableB)
    a.count(); b.count()
    BlockPrep(ds, a, b, ds.attrs.size * Dicts.dim)
  }

  /** Figure 10 a/b: PC and RR vs K at fixed L. */
  def sweepK(spark: SparkSession, p: BlockPrep, ks: Seq[Int], l: Int = 10): Seq[(Int, Double, Double)] =
    ks.map { k =>
      val m = RandomHyperplaneLSH.model(p.dim, k, l, seed = 23)
      val cands = RandomHyperplaneLSH.candidatePairs(spark, p.drA, p.drB, m)
      val (pc, rr) = RandomHyperplaneLSH.blockingMetrics(cands, p.ds.matches, p.ds.nA, p.ds.nB)
      (k, pc, rr)
    }

  /** Figure 10 c/d: PC and RR vs L at fixed K. */
  def sweepL(spark: SparkSession, p: BlockPrep, ls: Seq[Int], k: Int = 4): Seq[(Int, Double, Double)] =
    ls.map { l =>
      val m = RandomHyperplaneLSH.model(p.dim, k, l, seed = 23)
      val cands = RandomHyperplaneLSH.candidatePairs(spark, p.drA, p.drB, m)
      val (pc, rr) = RandomHyperplaneLSH.blockingMetrics(cands, p.ds.matches, p.ds.nA, p.ds.nB)
      (l, pc, rr)
    }

  /** Train the DeepER classifier once on the paper's sampled pairs, then
    * apply it *distributed* to every blocked candidate pair (Algorithm 4
    * line 9) and measure end-to-end precision/recall against the gold
    * matches (Figure 11).
    */
  def endToEnd(
      spark: SparkSession,
      p: BlockPrep,
      configs: Seq[(Int, Int)], // (K, L)
      cfg: DeepER.Config = DeepER.Config(folds = 1, epochs = 15),
      maxTrainNeg: Int = 30000,
  ): Seq[(Int, Int, Double, Double)] = {
    val dict = Dicts.gloveLike(p.ds.forms)
    val vecsA = TupleEmbedder.collectAvgVectors(spark, p.ds.tableA, p.ds.attrs, dict)
    val vecsB = TupleEmbedder.collectAvgVectors(spark, p.ds.tableB, p.ds.attrs, dict)
    val matches = p.ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toIndexedSeq
    val gold = matches.toSet

    // Train on negatives drawn from the *blocked candidate* distribution
    // (K=4, L=10): the classifier must reject exactly the high-similarity
    // non-matches that share a bucket with true duplicates, at ~10^3
    // negatives per positive — the paper's protocol sample (negatives
    // below the minimum matched cosine) never shows it those.
    val trainCands = RandomHyperplaneLSH.candidatePairs(
      spark, p.drA, p.drB, RandomHyperplaneLSH.model(p.dim, 4, 10, seed = 31))
    val negPairs = trainCands.collect()
      .map(r => (r.getLong(0), r.getLong(1)))
      .filterNot(gold)
    val rng = new scala.util.Random(cfg.seed)
    val negSample = rng.shuffle(negPairs.toIndexedSeq).take(maxTrainNeg)
    val feats = (matches.map(m => (m, 1.0)) ++ negSample.map(n => (n, 0.0))).map {
      case ((a, b), y) => (Similarity.cosineVector(vecsA(a), vecsB(b)), y)
    }
    val mlp = new MLPClassifier(p.ds.attrs.size, cfg.hidden, cfg.seed)
    mlp.fit(feats.map(_._1), feats.map(_._2), cfg.epochs, cfg.batchSize, cfg.lr, cfg.l2, cfg.seed)
    val threshold = DeepER.bestThreshold(feats.map(f => mlp.predictProb(f._1)), feats.map(_._2))
    val bMlp = spark.sparkContext.broadcast(mlp)
    val score = udf { (va: Seq[Seq[Double]], vb: Seq[Seq[Double]]) =>
      val sim = Similarity.cosineVector(va.map(_.toArray).toArray, vb.map(_.toArray).toArray)
      bMlp.value.predictProb(sim)
    }
    val nGold = p.ds.matches.count()
    configs.map { case (k, l) =>
      val m = RandomHyperplaneLSH.model(p.dim, k, l, seed = 23)
      val cands = RandomHyperplaneLSH.candidatePairs(spark, p.drA, p.drB, m)
      val scored = cands
        .join(p.drA.select(col("id").as("idA"), col("vecs").as("va")), "idA")
        .join(p.drB.select(col("id").as("idB"), col("vecs").as("vb")), "idB")
        .withColumn("prob", score(col("va"), col("vb")))
        .where(col("prob") >= threshold)
        .select("idA", "idB")
        .cache()
      val nPred = scored.count()
      val tp = scored.join(p.ds.matches,
        scored("idA") === p.ds.matches("idA") && scored("idB") === p.ds.matches("idB")).count()
      scored.unpersist()
      val prec = if (nPred == 0) 0.0 else tp.toDouble / nPred
      val rec = tp.toDouble / nGold
      (k, l, prec, rec)
    }
  }

  /** Figure 12: multi-probe recall at L=1, K=10 for varying top-N. */
  def multiProbe(
      spark: SparkSession,
      p: BlockPrep,
      mps: Seq[Int] = Seq(0, 1, 2),
      topNs: Seq[Int] = Seq(10, 20, 50, 100),
  ): Seq[(Int, Int, Double)] = {
    val m = RandomHyperplaneLSH.model(p.dim, 10, 1, seed = 29)
    for {
      mp <- mps
      n <- topNs
    } yield {
      val cands = MultiProbeLSH.topNCandidates(spark, p.drA, p.drB, m, mp, n)
      (mp, n, MultiProbeLSH.recall(cands, p.ds.matches))
    }
  }

  // Paper values for the printouts (Prod-AG / Pub-DS series of Figure 10).
  val fig10aPaper = Map( // K -> (Prod-AG PC, Pub-DS PC) at L=10
    1 -> (1.00, 1.00), 2 -> (1.00, 1.00), 4 -> (0.98, 1.00), 6 -> (0.93, 0.97),
    8 -> (0.84, 0.90), 10 -> (0.74, 0.81))
  val fig10bPaper = Map( // K -> (Prod-AG RR, Pub-DS RR) at L=10
    1 -> (0.40, 0.08), 2 -> (0.40, 0.08), 4 -> (0.39, 0.08), 6 -> (0.34, 0.07),
    8 -> (0.28, 0.05), 10 -> (0.20, 0.04))
  val fig10cPaper = Map( // L -> (Prod-AG PC, Pub-DS PC) at K=4
    1 -> (0.52, 0.60), 2 -> (0.70, 0.80), 4 -> (0.87, 0.93), 6 -> (0.94, 0.97),
    8 -> (0.97, 0.99), 10 -> (0.98, 1.00))
  val fig10dPaper = Map( // L -> (Prod-AG RR, Pub-DS RR) at K=4
    1 -> (0.15, 0.03), 2 -> (0.22, 0.05), 4 -> (0.31, 0.06), 6 -> (0.35, 0.07),
    8 -> (0.37, 0.08), 10 -> (0.39, 0.08))
  val fig12Paper = Map( // (mp, topN) -> recall on Prod-AG
    (0, 10) -> 0.16, (0, 20) -> 0.173, (0, 50) -> 0.186, (0, 100) -> 0.19,
    (1, 10) -> 0.33, (1, 20) -> 0.36, (1, 50) -> 0.41, (1, 100) -> 0.44,
    (2, 10) -> 0.42, (2, 20) -> 0.469, (2, 50) -> 0.53, (2, 100) -> 0.58)

  def blockingSweepRows(spark: SparkSession): (Seq[Seq[String]], Seq[Seq[String]]) = {
    val ag = prepareBlocks(spark, ERDatasets.prodAG(spark))
    val dsb = prepareBlocks(spark, ERDatasets.pubDS(spark))
    val ks = Seq(1, 2, 4, 6, 8, 10)
    val (agK, dsK) = (sweepK(spark, ag, ks), sweepK(spark, dsb, ks))
    val rowsK = ks.indices.map { i =>
      val k = ks(i)
      Seq(k.toString,
        fmtPct(agK(i)._2), fmtPct(dsK(i)._2), fmtPct(fig10aPaper(k)._1), fmtPct(fig10aPaper(k)._2),
        fmtPct(agK(i)._3), fmtPct(dsK(i)._3), fmtPct(fig10bPaper(k)._1), fmtPct(fig10bPaper(k)._2))
    }
    val ls = Seq(1, 2, 4, 6, 8, 10)
    val (agL, dsL) = (sweepL(spark, ag, ls), sweepL(spark, dsb, ls))
    val rowsL = ls.indices.map { i =>
      val l = ls(i)
      Seq(l.toString,
        fmtPct(agL(i)._2), fmtPct(dsL(i)._2), fmtPct(fig10cPaper(l)._1), fmtPct(fig10cPaper(l)._2),
        fmtPct(agL(i)._3), fmtPct(dsL(i)._3), fmtPct(fig10dPaper(l)._1), fmtPct(fig10dPaper(l)._2))
    }
    (rowsK, rowsL)
  }
}
