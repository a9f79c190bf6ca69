package repro.embed

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class VectorOpsSpec extends AnyFunSuite {

  private def randVec(rng: Random, n: Int): Array[Double] =
    Array.fill(n)(rng.nextDouble() * 10 - 5)

  private def forRandomPairs(trials: Int)(f: (Array[Double], Array[Double]) => Unit): Unit = {
    val rng = new Random(42)
    (1 to trials).foreach { _ =>
      val n = 1 + rng.nextInt(16)
      f(randVec(rng, n), randVec(rng, n))
    }
  }

  test("euclidean of identical vectors is zero") {
    forRandomPairs(50) { (a, _) => assert(VectorOps.euclidean(a, a) === 0.0) }
  }

  test("euclidean is symmetric") {
    forRandomPairs(100) { (a, b) =>
      assert(math.abs(VectorOps.euclidean(a, b) - VectorOps.euclidean(b, a)) < 1e-12)
    }
  }

  test("euclidean is non-negative") {
    forRandomPairs(100) { (a, b) => assert(VectorOps.euclidean(a, b) >= 0.0) }
  }

  test("euclidean satisfies the triangle inequality") {
    val rng = new Random(7)
    (1 to 200).foreach { _ =>
      val n = 1 + rng.nextInt(12)
      val (a, b, c) = (randVec(rng, n), randVec(rng, n), randVec(rng, n))
      assert(VectorOps.euclidean(a, c) <=
        VectorOps.euclidean(a, b) + VectorOps.euclidean(b, c) + 1e-9)
    }
  }

  test("euclideanSq is the square of euclidean") {
    forRandomPairs(100) { (a, b) =>
      val d = VectorOps.euclidean(a, b)
      assert(math.abs(VectorOps.euclideanSq(a, b) - d * d) < 1e-9)
    }
  }

  test("known distance: 3-4-5 triangle") {
    assert(VectorOps.euclidean(Array(0.0, 0.0), Array(3.0, 4.0)) === 5.0)
  }

  test("dot product of orthogonal unit vectors is zero") {
    assert(VectorOps.dot(Array(1.0, 0.0), Array(0.0, 1.0)) === 0.0)
  }

  test("dot product against itself is the squared norm") {
    forRandomPairs(100) { (a, _) =>
      val n = VectorOps.norm(a)
      assert(math.abs(VectorOps.dot(a, a) - n * n) < 1e-9)
    }
  }

  test("normalize yields a unit vector") {
    forRandomPairs(100) { (a, _) =>
      if (VectorOps.norm(a) > 1e-6)
        assert(math.abs(VectorOps.norm(VectorOps.normalize(a)) - 1.0) < 1e-9)
    }
  }

  test("normalize of zero vector stays zero") {
    assert(VectorOps.normalize(Array(0.0, 0.0, 0.0)).forall(_ == 0.0))
  }

  test("normalize does not mutate its input") {
    val a = Array(3.0, 4.0)
    VectorOps.normalize(a)
    assert(a.toSeq == Seq(3.0, 4.0))
  }

  test("normalized unit vectors are within MaxUnitDistance of each other") {
    forRandomPairs(100) { (a, b) =>
      if (VectorOps.norm(a) > 1e-6 && VectorOps.norm(b) > 1e-6) {
        val d = VectorOps.euclidean(VectorOps.normalize(a), VectorOps.normalize(b))
        assert(d <= VectorOps.MaxUnitDistance + 1e-9)
      }
    }
  }

  test("addInPlace accumulates") {
    val a = Array(1.0, 2.0)
    VectorOps.addInPlace(a, Array(0.5, -1.0))
    assert(a.toSeq == Seq(1.5, 1.0))
  }

  test("mean of a single vector is itself") {
    val v = Array(1.0, 2.0, 3.0)
    assert(VectorOps.mean(Seq(v)).toSeq == v.toSeq)
  }

  test("mean of symmetric vectors is the midpoint") {
    assert(VectorOps.mean(Seq(Array(0.0, 0.0), Array(2.0, 4.0))).toSeq == Seq(1.0, 2.0))
  }

  test("mean of an empty collection is rejected") {
    intercept[IllegalArgumentException] { VectorOps.mean(Seq.empty) }
  }

  test("dimension mismatch is rejected") {
    intercept[IllegalArgumentException] { VectorOps.euclidean(Array(1.0), Array(1.0, 2.0)) }
  }
}
