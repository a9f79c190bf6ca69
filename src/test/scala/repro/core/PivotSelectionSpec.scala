package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestData
import repro.embed.VectorOps

class PivotSelectionSpec extends AnyFunSuite {

  private def pool(seed: Long, n: Int, dim: Int): IndexedSeq[Array[Double]] = {
    val rng = new Random(seed)
    IndexedSeq.fill(n)(TestData.unitVec(rng, dim))
  }

  test("selects exactly k pivots") {
    val vs = pool(1, 100, 8)
    (1 to 5).foreach { k =>
      assert(PivotSelection.pcaPivots(vs, k).numPivots == k)
    }
  }

  test("pivots are members of the input pool") {
    val vs = pool(2, 80, 6)
    val ps = PivotSelection.pcaPivots(vs, 3)
    ps.pivots.foreach { p =>
      assert(vs.exists(v => VectorOps.euclidean(v, p) < 1e-12))
    }
  }

  test("pivots are pairwise distinct") {
    val vs = pool(3, 120, 8)
    val ps = PivotSelection.pcaPivots(vs, 5)
    val dists = for {
      i <- ps.pivots.indices
      j <- (i + 1) until ps.pivots.length
    } yield VectorOps.euclidean(ps.pivots(i), ps.pivots(j))
    assert(dists.forall(_ > 1e-9))
  }

  test("selection is deterministic") {
    val vs = pool(4, 90, 8)
    val a = PivotSelection.pcaPivots(vs, 4)
    val b = PivotSelection.pcaPivots(vs, 4)
    a.pivots.zip(b.pivots).foreach { case (x, y) => assert(x.toSeq == y.toSeq) }
  }

  test("the first PCA pivot is an outlier along the principal direction") {
    val rng = new Random(5)
    // two elongated clusters => principal direction separates them
    val c1 = TestData.unitVec(rng, 8)
    val c2 = c1.map(-_)
    val vs = IndexedSeq.fill(100)(TestData.near(rng, if (rng.nextBoolean()) c1 else c2, 0.2))
    val ps = PivotSelection.pcaPivots(vs, 1)
    val mean = VectorOps.mean(vs)
    val fromMean = vs.map(v => VectorOps.euclidean(v, mean)).sorted
    val p90 = fromMean((0.9 * fromMean.size).toInt)
    val pivotFromMean = VectorOps.euclidean(ps.pivots(0), mean)
    assert(pivotFromMean >= p90, s"pivot@$pivotFromMean p90=$p90 — not an outlier")
  }

  test("k greater than dim falls back to farthest-first top-up") {
    val vs = pool(6, 40, 3)
    val ps = PivotSelection.pcaPivots(vs, 6)
    assert(ps.numPivots == 6)
  }

  test("k bounded by pool size") {
    val vs = pool(7, 4, 5)
    val ps = PivotSelection.pcaPivots(vs, 10)
    assert(ps.numPivots == 4)
  }

  test("sample keeps order-spread subset and caps size") {
    val vs = pool(8, 100, 4)
    val s = PivotSelection.sample(vs, 10)
    assert(s.length == 10)
    assert(PivotSelection.sample(vs, 200).length == 100)
  }

  test("empty pool rejected") {
    intercept[IllegalArgumentException] { PivotSelection.pcaPivots(IndexedSeq.empty, 2) }
  }
}
