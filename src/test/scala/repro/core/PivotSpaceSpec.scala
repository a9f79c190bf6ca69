package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestData
import repro.embed.VectorOps

class PivotSpaceSpec extends AnyFunSuite {

  private val dim = 6

  test("pivot mapping has one coordinate per pivot, each a distance") {
    val rng = new Random(1)
    val pivots = PivotSet(Array.fill(3)(TestData.unitVec(rng, dim)))
    val x = TestData.unitVec(rng, dim)
    val m = pivots.map(x)
    assert(m.length == 3)
    m.indices.foreach { i =>
      assert(math.abs(m(i) - VectorOps.euclidean(pivots.pivots(i), x)) < 1e-12)
    }
  }

  test("mapping a pivot to itself yields a zero coordinate") {
    val rng = new Random(2)
    val p = TestData.unitVec(rng, dim)
    val pivots = PivotSet(Array(p))
    assert(pivots.map(p)(0) === 0.0)
  }

  test("Lemma 1 soundness: a filtered pair never matches (randomized)") {
    val rng = new Random(3)
    val pivots = PivotSet(Array.fill(3)(TestData.unitVec(rng, dim)))
    (1 to 500).foreach { _ =>
      val q = TestData.unitVec(rng, dim)
      val x = TestData.near(rng, q, rng.nextDouble() * 0.5)
      val tau = rng.nextDouble() * 0.5
      if (PivotSpace.filteredByPivots(pivots.map(q), pivots.map(x), tau))
        assert(VectorOps.euclidean(q, x) > tau, "filtered a true match")
    }
  }

  test("Lemma 2 soundness: a pivot-matched pair always matches (randomized)") {
    val rng = new Random(4)
    val pivots = PivotSet(Array.fill(3)(TestData.unitVec(rng, dim)))
    (1 to 500).foreach { _ =>
      val q = TestData.unitVec(rng, dim)
      val x = TestData.near(rng, q, rng.nextDouble() * 0.5)
      val tau = rng.nextDouble() * 0.8
      if (PivotSpace.matchedByPivots(pivots.map(q), pivots.map(x), tau))
        assert(VectorOps.euclidean(q, x) <= tau + 1e-12, "pivot-matched a non-match")
    }
  }

  test("Lemma 1 completeness on far pairs: far-apart mapped vectors get filtered") {
    // if |q'[i] - x'[i]| > tau for some i the pair is filtered — construct one
    val qm = Array(0.1, 0.5)
    val xm = Array(0.9, 0.5)
    assert(PivotSpace.filteredByPivots(qm, xm, tau = 0.3))
    assert(!PivotSpace.filteredByPivots(qm, xm, tau = 0.9))
  }

  test("Lemma 2 fires exactly when some q'[i] + x'[i] <= tau") {
    val qm = Array(0.2, 1.0)
    val xm = Array(0.1, 1.0)
    assert(PivotSpace.matchedByPivots(qm, xm, tau = 0.31))
    assert(!PivotSpace.matchedByPivots(qm, xm, tau = 0.25))
  }

  test("filter and match are mutually exclusive for tau >= 0") {
    val rng = new Random(5)
    val pivots = PivotSet(Array.fill(2)(TestData.unitVec(rng, dim)))
    (1 to 300).foreach { _ =>
      val qm = pivots.map(TestData.unitVec(rng, dim))
      val xm = pivots.map(TestData.unitVec(rng, dim))
      val tau = rng.nextDouble()
      assert(!(PivotSpace.filteredByPivots(qm, xm, tau) && PivotSpace.matchedByPivots(qm, xm, tau)))
    }
  }

  test("mapAll maps every vector") {
    val rng = new Random(6)
    val pivots = PivotSet(Array.fill(2)(TestData.unitVec(rng, dim)))
    val xs = Array.fill(5)(TestData.unitVec(rng, dim))
    val ms = pivots.mapAll(xs)
    assert(ms.length == 5)
    assert(ms(2).toSeq == pivots.map(xs(2)).toSeq)
  }

  test("empty pivot set is rejected") {
    intercept[IllegalArgumentException] { PivotSet(Array.empty) }
  }
}
