package repro.baseline

import org.apache.spark.sql.SparkSession
import repro.core.{DeepER, PRF}
import repro.data.ERDataset

/** A Magellan-style end-to-end entity matcher (Konda et al. 2016): for
  * every aligned attribute it engineers a battery of classical similarity
  * features (token Jaccard, trigram cosine, Jaro-Winkler, overlap, exact,
  * numeric closeness) and trains a random forest — the system DeepER is
  * compared against in Table 4.
  *
  * Per-tuple feature *profiles* (token sets, trigram vectors, capped
  * strings, parsed numerics) are precomputed once so pair featurization is
  * O(#attrs), mirroring Magellan's feature-table materialization.
  */
object MagellanLike {

  /** Precomputed per-attribute representation of one tuple. */
  final case class AttrProfile(
      raw: String,
      capped: String, // truncated for O(n^2) char metrics
      toks: Set[String],
      trigrams: Map[String, Int],
      numeric: Option[Double],
  )

  final case class Profile(attrs: Array[AttrProfile]) extends Serializable

  val featuresPerAttr = 6

  def profile(values: Seq[String], capLen: Int = 40): Profile =
    Profile(values.map { v =>
      AttrProfile(
        raw = v,
        capped = if (v == null) null else v.take(capLen),
        toks = StringSim.tokens(v),
        trigrams = StringSim.trigrams(if (v == null) null else v.take(120)),
        numeric = try { Option(v).map(_.toDouble) } catch { case _: Exception => None },
      )
    }.toArray)

  private def setJaccard(a: Set[String], b: Set[String]): Double =
    if (a.isEmpty && b.isEmpty) 1.0
    else if (a.isEmpty || b.isEmpty) 0.0
    else a.intersect(b).size.toDouble / a.union(b).size

  private def setOverlap(a: Set[String], b: Set[String]): Double =
    if (a.isEmpty && b.isEmpty) 1.0
    else if (a.isEmpty || b.isEmpty) 0.0
    else a.intersect(b).size.toDouble / math.min(a.size, b.size)

  private def triCosine(a: Map[String, Int], b: Map[String, Int]): Double =
    if (a.isEmpty && b.isEmpty) 1.0
    else if (a.isEmpty || b.isEmpty) 0.0
    else {
      val dot = a.keysIterator.map(k => a(k).toDouble * b.getOrElse(k, 0)).sum
      val na = math.sqrt(a.valuesIterator.map(v => v.toDouble * v).sum)
      val nb = math.sqrt(b.valuesIterator.map(v => v.toDouble * v).sum)
      dot / (na * nb)
    }

  /** Pair feature vector: `featuresPerAttr` similarities per attribute. */
  def features(pa: Profile, pb: Profile): Array[Double] = {
    require(pa.attrs.length == pb.attrs.length)
    val out = new Array[Double](pa.attrs.length * featuresPerAttr)
    var k = 0
    while (k < pa.attrs.length) {
      val a = pa.attrs(k); val b = pb.attrs(k)
      val base = k * featuresPerAttr
      out(base)     = setJaccard(a.toks, b.toks)
      out(base + 1) = triCosine(a.trigrams, b.trigrams)
      out(base + 2) = StringSim.jaroWinkler(a.capped, b.capped)
      out(base + 3) = setOverlap(a.toks, b.toks)
      out(base + 4) = StringSim.exact(a.raw, b.raw)
      out(base + 5) = (a.numeric, b.numeric) match {
        case (Some(x), Some(y)) =>
          val d = math.max(math.abs(x), math.abs(y))
          if (d == 0.0) 1.0 else math.max(0.0, 1.0 - math.abs(x - y) / d)
        case _ => 0.0
      }
      k += 1
    }
    out
  }

  def collectProfiles(ds: ERDataset, df: org.apache.spark.sql.DataFrame): Map[Long, Profile] =
    df.collect().map { r =>
      val id = r.getLong(r.fieldIndex("id"))
      val vals = ds.attrs.map { a =>
        val v = r.getAs[Any](a)
        if (v == null) null else v.toString
      }
      id -> profile(vals)
    }.toMap

  /** Run the baseline on the *same* labeled pairs and CV protocol as
    * DeepER (pairs come from [[DeepER.samplePairs]]) so Table 4 compares
    * classifiers, not protocols. Returns per-fold PRF.
    */
  def run(
      spark: SparkSession,
      ds: ERDataset,
      pairs: IndexedSeq[DeepER.LabeledPair],
      cfg: DeepER.Config,
      nTrees: Int = 20,
  ): Seq[PRF] = {
    val profA = collectProfiles(ds, ds.tableA)
    val profB = collectProfiles(ds, ds.tableB)
    val feats = pairs.map(p => features(profA(p.a), profB(p.b)))
    val labels = pairs.map(_.label)
    DeepER.crossValidate(feats, labels, cfg, (xs, ys, s) => {
      val forest = RandomForest.fit(xs, ys, nTrees = nTrees, seed = s)
      forest.predictProb _
    })
  }
}
