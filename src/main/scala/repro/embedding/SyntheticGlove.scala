package repro.embedding

import repro.nn.Linalg

/** A surface form of a concept: the word as it appears in data, the
  * latent concept it denotes, and the concept's frequency rank
  * (1 = most frequent). Synonyms/abbreviations ("Bill"/"William") share a
  * concept and therefore get nearby vectors.
  */
final case class SurfaceForm(word: String, concept: String, rank: Int) extends Serializable

/** Simulated pre-trained embedding dictionaries (the repo's stand-in for
  * GloVe-840B / GloVe-Wiki / Word2Vec / FastText, see DESIGN.md §4).
  *
  * Construction guarantees exactly the properties DeepER relies on:
  *  - surface forms of the same concept have cosine ≈ 1 (semantic match),
  *  - unrelated concepts are near-orthogonal in expectation (d ≥ 32),
  *  - `coverage` prunes the rare tail by concept rank, as smaller corpora
  *    do (GloVe-Wiki vs GloVe-840B, Table 5 of the paper),
  *  - `noiseStd` degrades vector quality (worse training corpora,
  *    cross-lingual dictionaries for Table 7).
  */
object SyntheticGlove {

  /** Deterministic Gaussian unit vector for a string key. */
  def hashVector(key: String, dim: Int, seed: Long): Array[Double] = {
    val rng = new scala.util.Random(key.hashCode.toLong * 1000003L ^ seed)
    Linalg.unit(Array.fill(dim)(rng.nextGaussian()))
  }

  /** Build a dictionary over `forms`.
    *
    * @param coverage     keep forms whose concept rank is within this
    *                     fraction of the max rank (1.0 = full vocabulary)
    * @param formCoverage additionally keep each surface form only with
    *                     this probability (deterministic in the word) —
    *                     models small corpora missing rare *variants*
    *                     (synonyms, abbreviations) of covered concepts
    * @param noiseStd     per-surface-form Gaussian perturbation of the
    *                     concept vector (0.15 keeps synonym cosine ≈ 0.97
    *                     at d=50; ≥1.0 models weakly-trained embeddings
    *                     that barely encode semantic relatedness)
    */
  def build(
      forms: Seq[SurfaceForm],
      dim: Int = 50,
      coverage: Double = 1.0,
      noiseStd: Double = 0.15,
      seed: Long = 11,
      formCoverage: Double = 1.0,
  ): EmbeddingDict = {
    require(forms.nonEmpty, "empty vocabulary")
    val maxRank = forms.map(_.rank).max
    def keepForm(w: String): Boolean =
      formCoverage >= 1.0 ||
        (math.abs((w.hashCode * 2654435761L ^ seed).toDouble % 1000) / 1000.0) < formCoverage
    val keep = forms.filter(f => f.rank <= math.max(1.0, coverage * maxRank) && keepForm(f.word))
    val vecs = keep.map { sf =>
      val base = hashVector("concept:" + sf.concept, dim, seed)
      val noise = hashVector("form:" + sf.word, dim, seed + 1)
      val v = base.clone()
      Linalg.axpy(v, noise, noiseStd)
      sf.word -> Linalg.unit(v)
    }.toMap
    EmbeddingDict(dim, vecs)
  }
}
