package repro.core

import org.apache.spark.sql.SparkSession
import repro.data.{ERDataset, NoiseModel}
import repro.embedding.EmbeddingDict
import repro.nn._

/** The end-to-end DeepER pipeline (Algorithm 3 + the Section 5.1 setup):
  * tuple DRs → similarity vectors → classifier, with the paper's
  * negative-sampling protocol (threshold = minimum cosine of matched
  * training pairs; negatives sampled below it), stratified K-fold CV, and
  * mean F1 reporting.
  */
object DeepER {

  /** Hyper-parameters; defaults are the paper's (Section 5.1). */
  final case class Config(
      negRatio: Int = 100,
      folds: Int = 5,
      epochs: Int = 20,
      batchSize: Int = 16,
      lr: Double = 0.01,
      l2: Double = 1e-3,
      hidden: Int = 50,
      maxTokensPerAttr: Int = 20,
      seed: Long = 7,
      /** Fraction of each training split actually used (Figure 6). */
      trainFraction: Double = 1.0,
      /** Fraction of training labels flipped (Figure 7). */
      labelNoise: Double = 0.0,
  )

  final case class LabeledPair(a: Long, b: Long, label: Double)

  /** Negative sampling per Section 5.1: threshold = minimum whole-tuple
    * cosine among matches; for each positive, `negRatio` negatives are
    * drawn by replacing one side with another tuple. Candidates above the
    * threshold or colliding with gold matches are rejected, and among the
    * valid draws the *most similar* one is kept — the paper's informative
    * negatives ("truck, not dog, as the negative for cat", after [34]).
    */
  def samplePairs(
      matches: IndexedSeq[(Long, Long)],
      vecsA: Map[Long, Array[Array[Double]]],
      vecsB: Map[Long, Array[Array[Double]]],
      negRatio: Int,
      seed: Long,
      candidatesPerNeg: Int = 5,
  ): (IndexedSeq[LabeledPair], Double) = {
    require(matches.nonEmpty, "no gold matches")
    val threshold = matches.map { case (a, b) => Similarity.tupleCosine(vecsA(a), vecsB(b)) }.min
    val idsA = vecsA.keys.toIndexedSeq.sorted
    val idsB = vecsB.keys.toIndexedSeq.sorted
    val gold = matches.toSet
    val rng = new scala.util.Random(seed)
    val pos = matches.map { case (a, b) => LabeledPair(a, b, 1.0) }
    val neg = matches.flatMap { case (a, b) =>
      (1 to negRatio).map { _ =>
        var best: (Long, Long) = null
        var bestSim = Double.NegativeInfinity
        (1 to candidatesPerNeg).foreach { _ =>
          val cand =
            if (rng.nextBoolean()) (a, idsB(rng.nextInt(idsB.size)))
            else (idsA(rng.nextInt(idsA.size)), b)
          if (!gold(cand)) {
            val sim = Similarity.tupleCosine(vecsA(cand._1), vecsB(cand._2))
            if (sim < threshold && sim > bestSim) { best = cand; bestSim = sim }
          }
        }
        // All draws rejected: accept any non-gold pair — in the synthetic
        // world every non-gold pair really is a non-duplicate.
        if (best == null) {
          var cand = (idsA(rng.nextInt(idsA.size)), b)
          while (gold(cand)) cand = (idsA(rng.nextInt(idsA.size)), idsB(rng.nextInt(idsB.size)))
          best = cand
        }
        LabeledPair(best._1, best._2, 0.0)
      }
    }
    ((pos ++ neg), threshold)
  }

  private def applyTrainKnobs(train: Seq[Int], labels: IndexedSeq[Double], cfg: Config): (Seq[Int], IndexedSeq[Double]) = {
    val rng = new scala.util.Random(cfg.seed + 13)
    val kept =
      if (cfg.trainFraction >= 1.0) train
      else {
        // Stratified subsample so tiny fractions keep some positives.
        val (p, n) = train.partition(labels(_) >= 0.5)
        rng.shuffle(p).take(math.max(2, (p.size * cfg.trainFraction).toInt)) ++
          rng.shuffle(n).take(math.max(2, (n.size * cfg.trainFraction).toInt))
      }
    val noisy =
      if (cfg.labelNoise <= 0.0) labels
      else {
        val keptSet = kept.toSet
        val flip = NoiseModel.flipLabels(labels, cfg.labelNoise, cfg.seed + 17)
        labels.indices.map(i => if (keptSet(i)) flip(i) else labels(i))
      }
    (kept, noisy)
  }

  /** Decision threshold maximizing F1 on the training fold — under heavy
    * class imbalance (1:100) or weak features a fixed 0.5 cut degenerates
    * to the majority class.
    */
  def bestThreshold(probs: Seq[Double], labels: Seq[Double]): Double =
    (1 to 19).map(_ * 0.05).maxBy(t => Evaluation.score(probs, labels, t).f1)

  /** Cross-validated classification over precomputed feature vectors
    * (used by both DeepER-avg and the classical baseline so the protocol
    * is identical). The decision threshold is selected on the training
    * fold. Returns per-fold PRF on the held-out fold.
    */
  def crossValidate(
      features: IndexedSeq[Array[Double]],
      labels: IndexedSeq[Double],
      cfg: Config,
      fit: (IndexedSeq[Array[Double]], IndexedSeq[Double], Long) => Array[Double] => Double,
  ): Seq[PRF] = {
    require(features.length == labels.length)
    Evaluation.stratifiedFolds(labels, cfg.folds, cfg.seed).zipWithIndex.map { case ((train0, test), f) =>
      val (train, trainLabels) = applyTrainKnobs(train0, labels, cfg)
      val predict = fit(
        train.map(features).toIndexedSeq,
        train.map(trainLabels).toIndexedSeq,
        cfg.seed + f)
      val t = bestThreshold(train.map(i => predict(features(i))), train.map(labels))
      Evaluation.score(test.map(i => predict(features(i))), test.map(labels), t)
    }
  }

  /** Mean-F1 over folds. */
  def meanF1(prfs: Seq[PRF]): Double = prfs.map(_.f1).sum / prfs.size * 100.0

  /** Full DeepER run with averaging composition and frozen embeddings —
    * the Table 4 configuration. Tuple embedding runs distributed; the
    * similarity vectors are precomputed once and the Figure-5
    * classification head is trained per fold.
    */
  def runAvg(spark: SparkSession, ds: ERDataset, dict: EmbeddingDict, cfg: Config = Config()): Seq[PRF] = {
    val vecsA = TupleEmbedder.collectAvgVectors(spark, ds.tableA, ds.attrs, dict)
    val vecsB = TupleEmbedder.collectAvgVectors(spark, ds.tableB, ds.attrs, dict)
    val matches = ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toIndexedSeq
    val (pairs, _) = samplePairs(matches, vecsA, vecsB, cfg.negRatio, cfg.seed)
    val feats = pairs.map(p => Similarity.cosineVector(vecsA(p.a), vecsB(p.b)))
    val labels = pairs.map(_.label)
    crossValidate(feats, labels, cfg, (xs, ys, s) => {
      val mlp = new MLPClassifier(ds.attrs.size, cfg.hidden, s)
      mlp.fit(xs, ys, cfg.epochs, cfg.batchSize, cfg.lr, cfg.l2, s)
      mlp.predictProb _
    })
  }

  /** Tokenized tuples as embedding-table indices, collected per table. */
  def collectTokenIndices(
      ds: ERDataset, index: Map[String, Int], unkIdx: Int, maxTokensPerAttr: Int,
  ): (Map[Long, Array[Array[Int]]], Map[Long, Array[Array[Int]]]) = {
    def coll(df: org.apache.spark.sql.DataFrame) =
      df.collect().map { r =>
        val id = r.getLong(r.fieldIndex("id"))
        val arrs = ds.attrs.map { a =>
          val v = r.getAs[Any](a)
          Tokenizer.tokenize(if (v == null) null else v.toString)
            .take(maxTokensPerAttr)
            .map(t => index.getOrElse(t, unkIdx))
            .toArray
        }.toArray
        id -> arrs
      }.toMap
    (coll(ds.tableA), coll(ds.tableB))
  }

  /** Corpus vocabulary of a dataset (all distinct tokens of both tables),
    * computed distributed.
    */
  def corpusVocab(spark: SparkSession, ds: ERDataset): Seq[String] = {
    import org.apache.spark.sql.functions._
    import spark.implicits._
    val tok = udf((s: String) => Tokenizer.tokenize(s))
    def toks(df: org.apache.spark.sql.DataFrame) =
      df.select(explode(flatten(array(ds.attrs.map(a => tok(col(a).cast("string"))): _*))).as("t"))
    toks(ds.tableA).union(toks(ds.tableB)).distinct().as[String].collect().toSeq.sorted
  }

  /** Full DeepER run through the end-to-end network of Figure 5 with a
    * choice of composition and optional embedding fine-tuning
    * (Sections 2.3 + 3.4; Figures 8 and 9).
    */
  def runNet(
      spark: SparkSession,
      ds: ERDataset,
      dict: EmbeddingDict,
      comp: Composition,
      trainEmbeddings: Boolean,
      cfg: Config = Config(negRatio = 4),
  ): Seq[PRF] = {
    val vecsA = TupleEmbedder.collectAvgVectors(spark, ds.tableA, ds.attrs, dict)
    val vecsB = TupleEmbedder.collectAvgVectors(spark, ds.tableB, ds.attrs, dict)
    val matches = ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toIndexedSeq
    val (pairs, _) = samplePairs(matches, vecsA, vecsB, cfg.negRatio, cfg.seed)

    val vocab = corpusVocab(spark, ds)
    val (index, emb0, unkIdx) = dict.toTable(vocab)
    val (toksA, toksB) = collectTokenIndices(ds, index, unkIdx, cfg.maxTokensPerAttr)
    val examples = pairs.map(p => PairExample(toksA(p.a), toksB(p.b), p.label))
    val labels = pairs.map(_.label)

    Evaluation.stratifiedFolds(labels, cfg.folds, cfg.seed).zipWithIndex.map { case ((train0, test), f) =>
      val (train, trainLabels) = applyTrainKnobs(train0, labels, cfg)
      val emb = if (trainEmbeddings) emb0.copy() else emb0
      val net = new DeepERNet(emb, unkIdx, ds.attrs.size, comp, cfg.hidden, trainEmbeddings, cfg.seed + f)
      val trainEx = train.map(i => examples(i).copy(label = trainLabels(i))).toIndexedSeq
      // Embeddings get a much smaller effective step than the dense
      // layers: Adam normalizes per-parameter step sizes, so the paper's
      // "update rate 0.01" (raw SGD scale) corresponds to a small
      // fraction of the Adam learning rate — anything near 1.0 destroys
      // the pre-trained geometry within an epoch.
      net.fit(trainEx, cfg.epochs, cfg.batchSize, cfg.lr, cfg.l2, embLrScale = 0.01, seed = cfg.seed + f)
      val t = bestThreshold(train.map(i => net.predictProb(examples(i))), train.map(labels))
      Evaluation.score(test.map(i => net.predictProb(examples(i))), test.map(labels), t)
    }
  }
}
