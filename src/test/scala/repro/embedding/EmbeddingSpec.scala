package repro.embedding

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.Linalg

class EmbeddingDictSpec extends AnyFunSuite {
  private val dict = EmbeddingDict(3, Map(
    "alpha" -> Array(1.0, 0.0, 0.0),
    "beta"  -> Array(0.0, 1.0, 0.0),
  ))

  test("lookup returns the stored vector") {
    assert(dict.lookup("alpha").sameElements(Array(1.0, 0.0, 0.0)))
  }

  test("lookup of unknown word returns the UNK zero vector") {
    assert(dict.lookup("gamma").sameElements(Array(0.0, 0.0, 0.0)))
  }

  test("contains distinguishes vocabulary membership") {
    assert(dict.contains("alpha") && !dict.contains("gamma"))
  }

  test("coverage is the in-vocabulary fraction") {
    assert(dict.coverage(Seq("alpha", "beta", "gamma", "delta")) == 0.5)
    assert(dict.coverage(Nil) == 1.0)
  }

  test("++ adds entries and rejects dimension mismatch") {
    val d2 = dict ++ Map("gamma" -> Array(0.0, 0.0, 1.0))
    assert(d2.contains("gamma") && d2.size == 3)
    intercept[IllegalArgumentException](dict ++ Map("bad" -> Array(1.0)))
  }

  test("toTable lays out sorted vocab rows plus a trailing UNK row") {
    val (idx, m, unkIdx) = dict.toTable(Seq("beta", "alpha", "beta"))
    assert(idx == Map("alpha" -> 0, "beta" -> 1))
    assert(unkIdx == 2 && m.rows == 3 && m.cols == 3)
    assert(m.row(0).sameElements(dict.lookup("alpha")))
    assert(m.row(2).forall(_ == 0.0))
  }

  test("toTable maps out-of-dictionary vocab words to UNK-like zero rows") {
    val (idx, m, _) = dict.toTable(Seq("alpha", "zzz"))
    assert(m.row(idx("zzz")).forall(_ == 0.0))
  }

  test("cosine helper works through the dictionary") {
    assert(math.abs(dict.cosine("alpha", "alpha") - 1.0) < 1e-9)
    assert(math.abs(dict.cosine("alpha", "beta")) < 1e-9)
  }
}

class SyntheticGloveSpec extends AnyFunSuite {
  private val forms = Seq(
    SurfaceForm("bill", "c:william", 1), SurfaceForm("william", "c:william", 1),
    SurfaceForm("seattle", "c:seattle", 2),
    SurfaceForm("rareword", "c:rare", 10),
  )

  test("synonyms (same concept) have high cosine") {
    val d = SyntheticGlove.build(forms, dim = 50)
    assert(d.cosine("bill", "william") > 0.85)
  }

  test("unrelated concepts are near-orthogonal") {
    val d = SyntheticGlove.build(forms, dim = 50)
    assert(math.abs(d.cosine("bill", "seattle")) < 0.5)
    assert(d.cosine("bill", "seattle") < d.cosine("bill", "william"))
  }

  test("vectors are unit norm") {
    val d = SyntheticGlove.build(forms, dim = 50)
    assert(math.abs(Linalg.norm(d.lookup("bill")) - 1.0) < 1e-9)
  }

  test("coverage prunes high-rank (rare) concepts") {
    val full = SyntheticGlove.build(forms, dim = 20, coverage = 1.0)
    val half = SyntheticGlove.build(forms, dim = 20, coverage = 0.5)
    assert(full.contains("rareword"))
    assert(!half.contains("rareword"))
    assert(half.contains("bill")) // rank 1 survives
  }

  test("construction is deterministic in seed") {
    val a = SyntheticGlove.build(forms, dim = 20, seed = 5)
    val b = SyntheticGlove.build(forms, dim = 20, seed = 5)
    assert(a.lookup("bill").sameElements(b.lookup("bill")))
  }

  test("different seeds give different dictionaries") {
    val a = SyntheticGlove.build(forms, dim = 20, seed = 5)
    val b = SyntheticGlove.build(forms, dim = 20, seed = 6)
    assert(!a.lookup("bill").sameElements(b.lookup("bill")))
  }

  test("larger noise lowers synonym cosine") {
    val tight = SyntheticGlove.build(forms, dim = 50, noiseStd = 0.1)
    val loose = SyntheticGlove.build(forms, dim = 50, noiseStd = 0.8)
    assert(tight.cosine("bill", "william") > loose.cosine("bill", "william"))
  }

  test("hashVector is deterministic and unit length") {
    val v1 = SyntheticGlove.hashVector("x", 30, 1)
    val v2 = SyntheticGlove.hashVector("x", 30, 1)
    assert(v1.sameElements(v2))
    assert(math.abs(Linalg.norm(v1) - 1.0) < 1e-9)
  }

  test("empty vocabulary is rejected") {
    intercept[IllegalArgumentException](SyntheticGlove.build(Nil))
  }
}

class RetrofitSpec extends AnyFunSuite {
  private val base = EmbeddingDict(4, Map(
    "known1" -> Array(1.0, 0.0, 0.0, 0.0),
    "known2" -> Array(0.0, 1.0, 0.0, 0.0),
  ))

  test("OOV word connected to a known word acquires a nearby vector") {
    val edges = Map("oov" -> Seq("known1"), "known1" -> Seq("oov"))
    val d = Retrofit.retrofit(base, edges)
    assert(Linalg.cosine(d.lookup("oov"), base.lookup("known1")) > 0.9)
  }

  test("anchored words stay close to their pre-trained vector") {
    val edges = Map("known1" -> Seq("known2"), "known2" -> Seq("known1"))
    val d = Retrofit.retrofit(base, edges, alpha = 1.0, beta = 1.0)
    assert(Linalg.cosine(d.lookup("known1"), base.lookup("known1")) > 0.7)
  }

  test("retrofitting pulls co-occurring known words together (SIGMOD/Stonebraker effect)") {
    val edges = Map("known1" -> Seq("known2"), "known2" -> Seq("known1"))
    val d = Retrofit.retrofit(base, edges)
    assert(Linalg.cosine(d.lookup("known1"), d.lookup("known2")) >
      Linalg.cosine(base.lookup("known1"), base.lookup("known2")))
  }

  test("isolated OOV word stays at zero") {
    val d = Retrofit.retrofit(base, Map("lonely" -> Nil))
    assert(d.lookup("lonely").forall(_ == 0.0))
  }

  test("OOV chain: word two hops from anchor still gets signal") {
    val edges = Map(
      "oov1" -> Seq("known1"), "oov2" -> Seq("oov1"),
      "known1" -> Seq("oov1"), // symmetric-ish
    )
    val d = Retrofit.retrofit(base, edges, iters = 20)
    assert(Linalg.norm(d.lookup("oov2")) > 0.0)
  }

  test("retrofit preserves words outside the graph") {
    val d = Retrofit.retrofit(base, Map("oov" -> Seq("known1")))
    assert(d.lookup("known2").sameElements(base.lookup("known2")))
  }
}
