package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestData
import repro.embed.VectorOps

/** Randomized soundness checks for Lemmas 3–6: whenever a lemma claims
  * "filtered", no contained vector may match; whenever it claims
  * "matched", every contained vector must match — verified against exact
  * distances in the original space.
  */
class GridGeometrySpec extends AnyFunSuite {

  private val dim = 5

  /** Build a tiny world: pivots, target vectors in a grid, query vectors
    * in a grid; return everything needed to cross-check lemma claims.
    */
  private def world(seed: Long, levels: Int = 3) = {
    val rng = new Random(seed)
    val pivots = PivotSet(Array.fill(2)(TestData.unitVec(rng, dim)))
    val targets = Array.fill(60)(TestData.unitVec(rng, dim))
    val queries = Array.fill(20)(TestData.unitVec(rng, dim))
    val hgS = new HierarchicalGrid(2, levels)
    val hgQ = new HierarchicalGrid(2, levels)
    val tLeaves = targets.map(t => (t, hgS.insert(pivots.map(t), -1)))
    val qLeaves = queries.zipWithIndex.map { case (q, i) => (q, hgQ.insert(pivots.map(q), i)) }
    (rng, pivots, tLeaves, qLeaves, hgS, hgQ)
  }

  test("Lemma 3 soundness: vector-cell filtered => no vector in the cell matches") {
    val (rng, pivots, tLeaves, _, _, _) = world(1)
    (1 to 100).foreach { _ =>
      val q = TestData.unitVec(rng, dim)
      val qm = pivots.map(q)
      val tau = rng.nextDouble() * 0.8
      tLeaves.foreach { case (t, leaf) =>
        if (GridGeometry.vectorCellFiltered(leaf, qm, tau))
          assert(VectorOps.euclidean(q, t) > tau, "Lemma 3 filtered a match")
      }
    }
  }

  test("Lemma 5 soundness: vector-cell matched => every vector in the cell matches") {
    val (rng, pivots, tLeaves, _, hgS, _) = world(2)
    (1 to 200).foreach { _ =>
      // query near a target so matching regions actually occur
      val t0 = tLeaves(rng.nextInt(tLeaves.length))._1
      val q = TestData.near(rng, t0, 0.05)
      val qm = pivots.map(q)
      val tau = 0.3 + rng.nextDouble() * 0.8
      hgS.leafCells.foreach { leaf =>
        if (GridGeometry.vectorCellMatched(leaf, qm, tau)) {
          tLeaves.filter(_._2 eq leaf).foreach { case (t, _) =>
            assert(VectorOps.euclidean(q, t) <= tau + 1e-9, "Lemma 5 matched a non-match")
          }
        }
      }
    }
  }

  test("Lemma 4 soundness: cell-cell filtered => no cross pair matches") {
    val (rng, _, tLeaves, qLeaves, hgS, hgQ) = world(3)
    val tau = 0.2
    for {
      qLeaf <- hgQ.leafCells
      tLeaf <- hgS.leafCells
      if GridGeometry.cellCellFiltered(tLeaf, qLeaf, tau)
      (q, ql) <- qLeaves if ql eq qLeaf
      (t, tl) <- tLeaves if tl eq tLeaf
    } assert(VectorOps.euclidean(q, t) > tau, "Lemma 4 filtered a match")
    assert(rng != null)
  }

  test("Lemma 6 soundness: cell-cell matched => every cross pair matches") {
    val (rng, _, tLeaves, qLeaves, hgS, hgQ) = world(4)
    (1 to 8).foreach { k =>
      val tau = 0.2 + 0.2 * k
      for {
        qLeaf <- hgQ.leafCells
        tLeaf <- hgS.leafCells
        if GridGeometry.cellCellMatched(tLeaf, qLeaf, tau)
        (q, ql) <- qLeaves if ql eq qLeaf
        (t, tl) <- tLeaves if tl eq tLeaf
      } assert(VectorOps.euclidean(q, t) <= tau + 1e-9, "Lemma 6 matched a non-match")
    }
    assert(rng != null)
  }

  test("Lemma 4 is implied by Lemma 3 for degenerate query cells") {
    // a query cell and a mapped vector at its center: cell-cell filtering
    // with an inflated box must be weaker (filter less) than vector-cell
    val (rng, pivots, _, _, hgS, hgQ) = world(5)
    val q = TestData.unitVec(rng, dim)
    val qm = pivots.map(q)
    val qLeaf = hgQ.insert(qm, 99)
    val tau = 0.3
    hgS.leafCells.foreach { tLeaf =>
      if (GridGeometry.cellCellFiltered(tLeaf, qLeaf, tau))
        assert(GridGeometry.vectorCellFiltered(tLeaf, qm, tau),
          "cell-cell filtered but vector-cell (stronger) did not")
    }
  }

  test("match and filter never fire together on the same pair") {
    val (rng, _, _, _, hgS, hgQ) = world(6)
    (1 to 5).foreach { k =>
      val tau = 0.2 * k
      for {
        qLeaf <- hgQ.leafCells
        tLeaf <- hgS.leafCells
      } assert(!(GridGeometry.cellCellMatched(tLeaf, qLeaf, tau) &&
                 GridGeometry.cellCellFiltered(tLeaf, qLeaf, tau)))
    }
    assert(rng != null)
  }
}
