package repro.embed

import org.scalatest.funsuite.AnyFunSuite

class EmbeddingSpec extends AnyFunSuite {

  private val emb = new HashingEmbedder(dim = 50)

  test("embeddings are deterministic") {
    val a = emb.embed("616 East 9th Street")
    val b = emb.embed("616 East 9th Street")
    assert(a.toSeq == b.toSeq)
  }

  test("embeddings are unit vectors") {
    Seq("Tom", "S.Bruce", "616 EAST 9TH STREET, 4W", "Cozy Clean").foreach { s =>
      assert(math.abs(VectorOps.norm(emb.embed(s)) - 1.0) < 1e-9, s)
    }
  }

  test("two embedders with the same seed agree; different seeds differ") {
    val e1 = new HashingEmbedder(50, seed = 1)
    val e2 = new HashingEmbedder(50, seed = 1)
    val e3 = new HashingEmbedder(50, seed = 2)
    assert(e1.embed("hello world").toSeq == e2.embed("hello world").toSeq)
    assert(e1.embed("hello world").toSeq != e3.embed("hello world").toSeq)
  }

  test("case changes embed identically (canonicalization)") {
    assert(VectorOps.euclidean(emb.embed("Castle Hill"), emb.embed("CASTLE HILL")) < 1e-9)
  }

  test("known abbreviations embed identically to their full forms") {
    assert(VectorOps.euclidean(emb.embed("616 East 9th St."), emb.embed("616 east 9th street")) < 1e-9)
    assert(VectorOps.euclidean(emb.embed("Mar"), emb.embed("March")) < 1e-9)
  }

  test("comma reordering embeds identically (bag of features)") {
    val d = VectorOps.euclidean(
      emb.embed("414 EAST 10TH STREET, 4E"),
      emb.embed("4E, 414 East 10th St."))
    assert(d < 1e-9)
  }

  test("a misspelling is much closer than an unrelated string") {
    val base = emb.embed("616 East 9th Street")
    val typo = emb.embed("616 East 9ht Street")
    val other = emb.embed("230 West 8th Street")
    assert(VectorOps.euclidean(base, typo) < VectorOps.euclidean(base, other))
  }

  test("unrelated strings are near-orthogonal (distance close to sqrt(2))") {
    val d = VectorOps.euclidean(emb.embed("zyqh vlmwk"), emb.embed("totally unrelated text"))
    assert(d > 1.0, s"distance $d")
  }

  test("identical strings have distance zero") {
    assert(VectorOps.euclidean(emb.embed("Tyke"), emb.embed("Tyke")) === 0.0)
  }

  test("embedAll preserves order and length") {
    val vs = emb.embedAll(Seq("a", "b", "c"))
    assert(vs.length == 3)
    assert(vs(1).toSeq == emb.embed("b").toSeq)
  }

  test("canonicalize lowercases and expands abbreviations") {
    assert(HashingEmbedder.canonicalize("616 East 9th St.") == "616 east 9th street")
    assert(HashingEmbedder.canonicalize("ACME Corp") == "acme corporation")
  }

  test("tokenize splits on non-alphanumerics and drops empties") {
    assert(HashingEmbedder.tokenize("4e, 414 east 10th st.") ==
      Seq("4e", "414", "east", "10th", "st"))
    assert(HashingEmbedder.tokenize("") == Seq.empty)
  }

  test("ngrams pads with boundary markers") {
    assert(HashingEmbedder.ngrams("a", 3) == Seq("^a$"))
    assert(HashingEmbedder.ngrams("ab", 3) == Seq("^ab", "ab$"))
    assert(HashingEmbedder.ngrams("tom", 3) == Seq("^to", "tom", "om$"))
  }

  test("splitmix64 is deterministic and mixes") {
    assert(HashingEmbedder.splitmix64(1L) == HashingEmbedder.splitmix64(1L))
    assert(HashingEmbedder.splitmix64(1L) != HashingEmbedder.splitmix64(2L))
  }

  test("dim parameter controls output length") {
    val e = new HashingEmbedder(123)
    assert(e.embed("x").length == 123)
  }

  test("zero dim is rejected") {
    intercept[IllegalArgumentException] { new HashingEmbedder(0) }
  }
}
