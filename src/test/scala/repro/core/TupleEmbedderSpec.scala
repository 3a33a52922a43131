package repro.core

import repro.SparkSpec
import repro.embedding.EmbeddingDict
import repro.nn.{Linalg, LSTMParams, Mat}

class TupleEmbedderSpec extends SparkSpec {
  import org.apache.spark.sql.Row
  import org.apache.spark.sql.types._

  private val dict = EmbeddingDict(2, Map(
    "bill" -> Array(1.0, 0.0),
    "gates" -> Array(0.0, 1.0),
    "seattle" -> Array(1.0, 1.0),
  ))

  private def mkDf(rows: Seq[(Long, String, String)]) = {
    val schema = StructType(Seq(
      StructField("id", LongType, false),
      StructField("name", StringType, true),
      StructField("city", StringType, true)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(rows.map(r => Row(r._1, r._2, r._3)), 2), schema)
  }

  test("avgAttr averages token vectors (Algorithm 1)") {
    val v = TupleEmbedder.avgAttr("Bill Gates", dict)
    assert(v.sameElements(Array(0.5, 0.5)))
  }

  test("avgAttr of null/empty is the UNK zero vector") {
    assert(TupleEmbedder.avgAttr(null, dict).forall(_ == 0.0))
    assert(TupleEmbedder.avgAttr("", dict).forall(_ == 0.0))
  }

  test("avgAttr maps OOV tokens to UNK inside the average") {
    val v = TupleEmbedder.avgAttr("bill zzz", dict)
    assert(v.sameElements(Array(0.5, 0.0)))
  }

  test("withAvgVectors adds per-attribute vectors and the concatenated DR") {
    val df = mkDf(Seq((0L, "bill gates", "seattle")))
    val out = TupleEmbedder.withAvgVectors(spark, df, Seq("name", "city"), dict)
    val row = out.select("vecs", "dr").head()
    val vecs = row.getSeq[Seq[Double]](0)
    assert(vecs == Seq(Seq(0.5, 0.5), Seq(1.0, 1.0)))
    assert(row.getSeq[Double](1) == Seq(0.5, 0.5, 1.0, 1.0))
  }

  test("withAvgVectors runs distributed over partitions") {
    val df = mkDf((0L until 100L).map(i => (i, "bill", "seattle")))
    val out = TupleEmbedder.withAvgVectors(spark, df, Seq("name", "city"), dict)
    assert(out.count() == 100)
    assert(out.rdd.getNumPartitions > 1)
  }

  test("collectAvgVectors returns a vector matrix per tuple id") {
    val df = mkDf(Seq((5L, "gates", null)))
    val m = TupleEmbedder.collectAvgVectors(spark, df, Seq("name", "city"), dict)
    assert(m(5L)(0).sameElements(Array(0.0, 1.0)))
    assert(m(5L)(1).forall(_ == 0.0))
  }

  test("withLstmVectors produces hidDim-sized DRs for every tuple") {
    val df = mkDf(Seq((0L, "bill gates", "seattle"), (1L, null, null)))
    val (index, emb, unkIdx) = dict.toTable(Seq("bill", "gates", "seattle"))
    val lstm = new LSTMParams(2, 5, seed = 1)
    val out = TupleEmbedder.withLstmVectors(spark, df, Seq("name", "city"), index, unkIdx, emb, lstm)
    val drs = out.orderBy("id").select("dr").collect().map(_.getSeq[Double](0))
    assert(drs.forall(_.size == 5))
    // Tuple with no tokens gets the zero hidden state.
    assert(drs(1).forall(_ == 0.0))
  }

  test("lstm DR equals a driver-side forward pass (distributed = local)") {
    val df = mkDf(Seq((0L, "bill gates", "seattle")))
    val (index, emb, unkIdx) = dict.toTable(Seq("bill", "gates", "seattle"))
    val lstm = new LSTMParams(2, 4, seed = 2)
    val out = TupleEmbedder.withLstmVectors(spark, df, Seq("name", "city"), index, unkIdx, emb, lstm)
    val got = out.select("dr").head().getSeq[Double](0).toArray
    val xs = Seq("bill", "gates", "seattle").map(t => emb.row(index(t))).toArray
    val expected = repro.nn.LSTM.forward(lstm, xs).last
    assert(got.zip(expected).forall { case (a, b) => math.abs(a - b) < 1e-12 })
  }

  test("matched tuples have higher DR cosine than unmatched (semantic property)") {
    val dictBig = repro.embedding.SyntheticGlove.build(
      Seq(
        repro.embedding.SurfaceForm("bill", "c1", 1),
        repro.embedding.SurfaceForm("william", "c1", 1),
        repro.embedding.SurfaceForm("prague", "c2", 2),
        repro.embedding.SurfaceForm("tokyo", "c3", 3)),
      dim = 30)
    val a = TupleEmbedder.avgAttr("bill", dictBig)
    val b = TupleEmbedder.avgAttr("william", dictBig)
    val c = TupleEmbedder.avgAttr("tokyo", dictBig)
    assert(Linalg.cosine(a, b) > Linalg.cosine(a, c))
  }
}
