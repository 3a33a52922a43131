package repro.core

/** Precision / recall / F-measure, the paper's reporting metrics. */
final case class PRF(precision: Double, recall: Double, f1: Double) {
  /** Percent-scale F1 as reported in the paper's tables. */
  def f1Pct: Double = f1 * 100.0
}

object Evaluation {

  def fromCounts(tp: Long, fp: Long, fn: Long): PRF = {
    val p = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    val r = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
    val f = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    PRF(p, r, f)
  }

  /** Score predicted probabilities against {0,1} labels at `threshold`. */
  def score(probs: Seq[Double], labels: Seq[Double], threshold: Double = 0.5): PRF = {
    require(probs.length == labels.length)
    var tp = 0L; var fp = 0L; var fn = 0L
    probs.zip(labels).foreach { case (p, y) =>
      val pred = p >= threshold
      val pos = y >= 0.5
      if (pred && pos) tp += 1
      else if (pred && !pos) fp += 1
      else if (!pred && pos) fn += 1
    }
    fromCounts(tp, fp, fn)
  }

  /** Stratified K-fold index splits: positives and negatives are split
    * separately so every fold keeps the global class ratio (the paper uses
    * 5-fold CV with a fixed duplicate:non-duplicate ratio).
    */
  def stratifiedFolds(labels: IndexedSeq[Double], k: Int, seed: Long): Seq[(Seq[Int], Seq[Int])] = {
    val rng = new scala.util.Random(seed)
    val pos = rng.shuffle(labels.indices.filter(labels(_) >= 0.5).toIndexedSeq)
    val neg = rng.shuffle(labels.indices.filter(labels(_) < 0.5).toIndexedSeq)
    (0 until k).map { f =>
      val testPos = pos.zipWithIndex.collect { case (i, j) if j % k == f => i }
      val testNeg = neg.zipWithIndex.collect { case (i, j) if j % k == f => i }
      val test = testPos ++ testNeg
      val testSet = test.toSet
      (labels.indices.filterNot(testSet), test)
    }
  }
}
