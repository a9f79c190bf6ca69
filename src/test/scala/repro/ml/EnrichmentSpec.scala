package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import repro.embed.HashingEmbedder

class EnrichmentSpec extends AnyFunSuite {
  import Enrichment._

  private val targets = IndexedSeq("Castle Hill", "West Village", "Bronxdale")
  private val attrs   = IndexedSeq(10.0, 20.0, 30.0)

  test("equi matcher only matches exact strings") {
    val m = EquiMatcher()
    assert(m.matchIdx("Castle Hill", targets) == Seq(0))
    assert(m.matchIdx("castle hill", targets) == Seq.empty)
  }

  test("jaccard matcher tolerates token reorder, not misspellings") {
    val m = JaccardMatcher(0.9)
    assert(m.matchIdx("Hill Castle", targets) == Seq(0))
    assert(m.matchIdx("Castel Hill", targets) == Seq.empty)
  }

  test("fuzzy matcher tolerates misspellings") {
    // "hil" vs "hill" has edit similarity 0.75 >= delta
    val m = FuzzyMatcher(0.6, delta = 0.7)
    assert(m.matchIdx("Castle Hil", targets) == Seq(0))
  }

  test("embedding matcher matches case/abbreviation variants at tight tau") {
    val m = EmbeddingMatcher(new HashingEmbedder(32), tau = 0.1)
    assert(m.matchIdx("CASTLE HILL", targets) == Seq(0))
    assert(m.matchIdx("totally different", targets) == Seq.empty)
  }

  test("enrich averages matched attributes and reports the match rate") {
    val (vals, rate) = enrich(
      IndexedSeq("Castle Hill", "nothing", "West Village"),
      targets, attrs, EquiMatcher())
    assert(vals == IndexedSeq(Some(10.0), None, Some(20.0)))
    assert(math.abs(rate - 2.0 / 3) < 1e-9)
  }

  test("enrich memoizes per distinct query value") {
    var calls = 0
    val counting = new Matcher {
      val name = "counting"
      def matchIdx(q: String, ts: IndexedSeq[String]): Seq[Int] = { calls += 1; Seq.empty }
    }
    enrich(IndexedSeq("a", "a", "a", "b"), targets, attrs, counting)
    assert(calls == 2)
  }

  test("enrich averages over multiple matches") {
    val (vals, _) = enrich(IndexedSeq("x"), IndexedSeq("x", "x"), IndexedSeq(1.0, 3.0), EquiMatcher())
    assert(vals == IndexedSeq(Some(2.0)))
  }

  test("mismatched target lengths rejected") {
    intercept[IllegalArgumentException] {
      enrich(IndexedSeq("a"), IndexedSeq("a", "b"), IndexedSeq(1.0), EquiMatcher())
    }
  }
}
