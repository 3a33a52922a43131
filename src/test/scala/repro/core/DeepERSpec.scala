package repro.core

import repro.SparkSpec
import repro.data.ERDatasets
import repro.embedding.SyntheticGlove
import repro.nn.{AvgComp, LstmComp}

class DeepERSpec extends SparkSpec {

  private lazy val ds = ERDatasets.restFZ(spark)
  private lazy val dict = SyntheticGlove.build(ds.forms, dim = 50)
  private lazy val vecsA = TupleEmbedder.collectAvgVectors(spark, ds.tableA, ds.attrs, dict)
  private lazy val vecsB = TupleEmbedder.collectAvgVectors(spark, ds.tableB, ds.attrs, dict)
  private lazy val matches = ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toIndexedSeq

  test("samplePairs yields 1 + negRatio pairs per match") {
    val (pairs, _) = DeepER.samplePairs(matches, vecsA, vecsB, negRatio = 4, seed = 1)
    assert(pairs.size == matches.size * 5)
    assert(pairs.count(_.label == 1.0) == matches.size)
  }

  test("samplePairs negatives never collide with gold matches") {
    val (pairs, _) = DeepER.samplePairs(matches, vecsA, vecsB, negRatio = 4, seed = 2)
    val gold = matches.toSet
    assert(pairs.filter(_.label == 0.0).forall(p => !gold((p.a, p.b))))
  }

  test("sampling threshold is the minimum matched-pair cosine (Section 5.1)") {
    val (_, threshold) = DeepER.samplePairs(matches, vecsA, vecsB, 2, seed = 3)
    val minSim = matches.map { case (a, b) => Similarity.tupleCosine(vecsA(a), vecsB(b)) }.min
    assert(threshold == minSim)
  }

  test("samplePairs is deterministic in seed") {
    val (p1, _) = DeepER.samplePairs(matches, vecsA, vecsB, 3, seed = 4)
    val (p2, _) = DeepER.samplePairs(matches, vecsA, vecsB, 3, seed = 4)
    assert(p1 == p2)
  }

  test("crossValidate produces one PRF per fold") {
    val feats = IndexedSeq.tabulate(200)(i => Array(if (i < 40) 0.9 else 0.1))
    val labels = IndexedSeq.tabulate(200)(i => if (i < 40) 1.0 else 0.0)
    val cfg = DeepER.Config(folds = 4, epochs = 5)
    val prfs = DeepER.crossValidate(feats, labels, cfg, (xs, ys, s) => {
      val m = new repro.nn.MLPClassifier(1, 4, s); m.fit(xs, ys, 10); m.predictProb _
    })
    assert(prfs.size == 4)
    assert(prfs.forall(_.f1 > 0.9)) // trivially separable
  }

  test("runAvg achieves high F1 on the easy Rest-FZ dataset") {
    val prfs = DeepER.runAvg(spark, ds, dict,
      DeepER.Config(negRatio = 4, folds = 3, epochs = 12, seed = 5))
    val f1 = DeepER.meanF1(prfs)
    assert(f1 > 90.0, s"F1 = $f1")
  }

  test("trainFraction knob reduces the training set without crashing the protocol") {
    val prfs = DeepER.runAvg(spark, ds, dict,
      DeepER.Config(negRatio = 4, folds = 2, epochs = 8, trainFraction = 0.1, seed = 6))
    assert(prfs.size == 2)
    assert(prfs.forall(p => p.f1 >= 0.0 && p.f1 <= 1.0))
  }

  test("heavy label noise lowers F1 relative to clean labels") {
    val clean = DeepER.meanF1(DeepER.runAvg(spark, ds, dict,
      DeepER.Config(negRatio = 4, folds = 2, epochs = 10, seed = 7)))
    val noisy = DeepER.meanF1(DeepER.runAvg(spark, ds, dict,
      DeepER.Config(negRatio = 4, folds = 2, epochs = 10, seed = 7, labelNoise = 0.45)))
    assert(noisy <= clean, s"noisy=$noisy clean=$clean")
  }

  test("corpusVocab collects distinct tokens from both tables") {
    val vocab = DeepER.corpusVocab(spark, ds)
    assert(vocab.nonEmpty)
    assert(vocab.distinct.size == vocab.size)
    assert(vocab == vocab.sorted)
  }

  test("collectTokenIndices maps OOV tokens to the UNK row and caps length") {
    val (index, _, unkIdx) = dict.toTable(DeepER.corpusVocab(spark, ds))
    val (ta, _) = DeepER.collectTokenIndices(ds, index, unkIdx, maxTokensPerAttr = 2)
    assert(ta.nonEmpty)
    assert(ta.values.forall(_.forall(_.length <= 2)))
  }

  test("runNet with averaging composition works end-to-end on a small config") {
    val prfs = DeepER.runNet(spark, ds, dict, AvgComp, trainEmbeddings = false,
      DeepER.Config(negRatio = 2, folds = 2, epochs = 6, seed = 8))
    assert(prfs.size == 2)
    assert(DeepER.meanF1(prfs) > 60.0)
  }

  test("runNet with LSTM composition runs end-to-end (smoke, tiny epochs)") {
    val prfs = DeepER.runNet(spark, ds, dict, LstmComp(10), trainEmbeddings = false,
      DeepER.Config(negRatio = 1, folds = 2, epochs = 2, maxTokensPerAttr = 5, seed = 9))
    assert(prfs.size == 2)
  }

  test("meanF1 averages across folds on percent scale") {
    assert(math.abs(DeepER.meanF1(Seq(PRF(1, 1, 0.8), PRF(1, 1, 0.6))) - 70.0) < 1e-9)
  }
}
