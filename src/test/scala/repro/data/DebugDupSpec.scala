package repro.data

import org.scalatest.funsuite.AnyFunSuite

/** Regression guard: at realistic pool sizes, no surface word may denote
  * two concepts (an earlier abbreviation scheme produced such homonyms,
  * silently corrupting the embedding dictionary).
  */
class WordUniquenessSpec extends AnyFunSuite {
  test("no homonyms in a large pool (fzna, 250 concepts)") {
    val pool = new WordPool("fzna", 250, 2, seed = 600)
    val dups = pool.surfaceForms.groupBy(_.word).filter(_._2.map(_.concept).distinct.size > 1)
    assert(dups.isEmpty, dups.take(5).map { case (w, fs) => s"$w -> ${fs.map(_.concept)}" }.mkString("; "))
  }

  test("no homonyms across the full Rest-FZ vocabulary") {
    val pools = Seq(
      new WordPool("fzna", 250, 2, seed = 600),
      new WordPool("fzad", 150, 2, seed = 601),
      new WordPool("fzci", 30, 2, seed = 602),
      new WordPool("fzcu", 25, 2, seed = 603),
      new WordPool("fzwe", 200, 1, seed = 604))
    val all = pools.flatMap(_.surfaceForms)
    val dups = all.groupBy(_.word).filter(_._2.map(_.concept).distinct.size > 1)
    assert(dups.isEmpty, dups.take(5).toString)
  }
}
