package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class NetworkSpec extends AnyFunSuite {

  /** Tiny world: 8 "real" tokens + UNK; matching pairs share tokens per
    * attribute, non-matching pairs use disjoint tokens.
    */
  private val V = 9
  private val dim = 6
  private def embTable(seed: Long) = Mat.gaussian(V, dim, 0.5, seed)
  private val unk = V - 1

  private def ex(aToks: Array[Array[Int]], bToks: Array[Array[Int]], y: Double) =
    PairExample(aToks, bToks, y)

  private def toyData(n: Int, seed: Long): IndexedSeq[PairExample] = {
    val rng = new scala.util.Random(seed)
    IndexedSeq.fill(n) {
      if (rng.nextBoolean()) {
        val t = Array(Array(0, 1), Array(2 + rng.nextInt(2)))
        ex(t, t.map(_.clone()), 1.0) // identical → match
      } else {
        ex(Array(Array(0, 1), Array(2)), Array(Array(4, 5), Array(6)), 0.0)
      }
    }
  }

  test("predictProb lies in (0, 1)") {
    val net = new DeepERNet(embTable(1), unk, 2, AvgComp)
    val p = net.predictProb(ex(Array(Array(0), Array(1)), Array(Array(2), Array(3)), 0.0))
    assert(p > 0.0 && p < 1.0)
  }

  test("avg composition: identical tuples get similarity vector of ones internally") {
    // Indirect check: identical tuples must score higher than disjoint ones
    // after training.
    val net = new DeepERNet(embTable(2), unk, 2, AvgComp, seed = 3)
    net.fit(toyData(120, 4), epochs = 15, seed = 5)
    val same = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(0, 1), Array(2)), 1.0))
    val diff = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(4, 5), Array(6)), 0.0))
    assert(same > 0.8, s"same=$same")
    assert(diff < 0.2, s"diff=$diff")
  }

  test("empty attribute embeds as UNK without crashing") {
    val net = new DeepERNet(embTable(3), unk, 2, AvgComp)
    val p = net.predictProb(ex(Array(Array.empty[Int], Array(1)), Array(Array(0), Array(1)), 0.0))
    assert(!p.isNaN)
  }

  test("fit reduces training loss (avg)") {
    val net = new DeepERNet(embTable(4), unk, 2, AvgComp, seed = 6)
    val losses = net.fit(toyData(100, 7), epochs = 10, seed = 8)
    assert(losses.last < losses.head)
  }

  test("fit reduces training loss (lstm)") {
    val net = new DeepERNet(embTable(5), unk, 2, LstmComp(8), seed = 9)
    val losses = net.fit(toyData(60, 10), epochs = 10, seed = 11)
    assert(losses.last < losses.head)
  }

  test("lstm composition separates toy matches from non-matches") {
    val net = new DeepERNet(embTable(6), unk, 2, LstmComp(8), seed = 12)
    net.fit(toyData(120, 13), epochs = 25, seed = 14)
    val same = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(0, 1), Array(2)), 1.0))
    val diff = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(4, 5), Array(6)), 0.0))
    assert(same > diff)
  }

  test("bilstm composition separates toy matches from non-matches") {
    val net = new DeepERNet(embTable(7), unk, 2, BiLstmComp(6), seed = 15)
    net.fit(toyData(120, 16), epochs = 25, seed = 17)
    val same = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(0, 1), Array(2)), 1.0))
    val diff = net.predictProb(ex(Array(Array(0, 1), Array(2)), Array(Array(4, 5), Array(6)), 0.0))
    assert(same > diff)
  }

  test("sent2vec-like composition trains") {
    val net = new DeepERNet(embTable(8), unk, 2, Sent2VecComp, seed = 18)
    val losses = net.fit(toyData(80, 19), epochs = 10, seed = 20)
    assert(losses.last < losses.head)
  }

  test("simDim follows the composition") {
    assert(new DeepERNet(embTable(9), unk, 3, AvgComp).simDim == 3)
    assert(new DeepERNet(embTable(9), unk, 3, LstmComp(7)).simDim == 7)
    assert(new DeepERNet(embTable(9), unk, 3, BiLstmComp(7)).simDim == 14)
    assert(new DeepERNet(embTable(9), unk, 3, Sent2VecComp).simDim == dim)
  }

  test("frozen embeddings are not modified by training") {
    val e = embTable(10)
    val before = e.data.clone()
    val net = new DeepERNet(e, unk, 2, AvgComp, trainEmbeddings = false, seed = 21)
    net.fit(toyData(60, 22), epochs = 5, seed = 23)
    assert(e.data.sameElements(before))
  }

  test("end-to-end tuning modifies the embedding table (Section 3.4)") {
    val e = embTable(11)
    val before = e.data.clone()
    val net = new DeepERNet(e, unk, 2, AvgComp, trainEmbeddings = true, seed = 24)
    net.fit(toyData(60, 25), epochs = 5, seed = 26)
    assert(!e.data.sameElements(before))
  }

  test("end-to-end tuning also works through the LSTM composer") {
    val e = embTable(12)
    val before = e.data.clone()
    val net = new DeepERNet(e, unk, 2, LstmComp(6), trainEmbeddings = true, seed = 27)
    net.fit(toyData(40, 28), epochs = 3, seed = 29)
    assert(!e.data.sameElements(before))
  }

  test("training is deterministic in seeds") {
    def run(): Seq[Double] = {
      val net = new DeepERNet(embTable(13), unk, 2, AvgComp, seed = 30)
      net.fit(toyData(50, 31), epochs = 3, seed = 32)
      toyData(10, 33).map(net.predictProb)
    }
    assert(run() == run())
  }

  test("prediction is symmetric for avg composition (cosine is symmetric)") {
    val net = new DeepERNet(embTable(14), unk, 2, AvgComp, seed = 34)
    val a = Array(Array(0, 1), Array(2))
    val b = Array(Array(3, 4), Array(5))
    assert(math.abs(net.predictProb(ex(a, b, 0)) - net.predictProb(ex(b, a, 0))) < 1e-12)
  }
}
