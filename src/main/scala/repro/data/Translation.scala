package repro.data

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.embedding.SurfaceForm

/** Synthetic "Google translate" for the multilingual experiment (Table 7).
  *
  * Each token maps to one of two Spanish variants (`es_w` / `esb_w`),
  * chosen deterministically from the token and its position — modelling
  * real MT inconsistency, where the same source word is rendered
  * differently in different contexts (word choice, morphology). Concepts
  * are unchanged — translation preserves meaning — so the Spanish
  * embedding dictionary (built from both variants, with degraded vector
  * quality) still bridges them semantically, while *exact* token overlap
  * between a tuple and its duplicate is partially destroyed. This
  * reproduces the paper's observation: the pipeline works unchanged on a
  * translated dataset, at a mildly lower F1.
  */
object Translation {

  def variants(w: String): Seq[String] = Seq("es_" + w, "esb_" + w)

  /** Deterministic variant choice per occurrence: the salt (row id) makes
    * the two records of one entity translate independently, as real MT
    * output does.
    */
  def translateToken(w: String, pos: Int, salt: Long): String =
    variants(w)(math.abs((w.hashCode * 31 + pos * 7 + salt * 2654435761L).toInt) % 2)

  /** Probability that translation silently drops a token (articles,
    * particles, merged compounds) — applied independently per record.
    */
  val omissionRate = 0.12

  private def omitted(w: String, pos: Int, salt: Long): Boolean =
    math.abs((w.hashCode * 17 + pos * 13 + salt * 1099511627791L).toInt) % 100 < (omissionRate * 100).toInt

  private val translateValue = udf { (s: String, id: Long) =>
    if (s == null) null
    else {
      val toks = s.split("\\s+").zipWithIndex
      val kept = toks.filterNot { case (w, i) => toks.length > 1 && omitted(w, i, id) }
      val use = if (kept.isEmpty) toks.take(1) else kept
      use.map { case (w, i) => translateToken(w, i, id) }.mkString(" ")
    }
  }

  def translateTable(df: DataFrame, attrs: Seq[String]): DataFrame =
    attrs.foldLeft(df)((d, a) => d.withColumn(a, translateValue(col(a), col("id"))))

  /** Both variants of every surface form, sharing the source concept. */
  def translateForms(forms: Seq[SurfaceForm]): Seq[SurfaceForm] =
    forms.flatMap(f => variants(f.word).map(v => f.copy(word = v)))

  def translate(ds: ERDataset): ERDataset =
    ds.copy(
      name = ds.name + "-es",
      tableA = translateTable(ds.tableA, ds.attrs),
      tableB = translateTable(ds.tableB, ds.attrs),
      forms = translateForms(ds.forms))
}
