package repro

import scala.util.Random
import repro.core.ColumnVectors
import repro.embed.VectorOps

/** Shared deterministic generators for unit tests: random unit vectors,
  * clustered columns (so similarity search has non-trivial structure), and
  * small repositories.
  */
object TestData {

  def unitVec(rng: Random, dim: Int): Array[Double] =
    VectorOps.normalize(Array.fill(dim)(rng.nextGaussian()))

  /** A unit vector near `center`: center + gaussian jitter, renormalized. */
  def near(rng: Random, center: Array[Double], jitter: Double): Array[Double] =
    VectorOps.normalize(center.map(_ + rng.nextGaussian() * jitter))

  /** Random repository: `nCols` columns of `colSize` vectors clustered
    * around `nClusters` centers so that some query vectors find matches.
    */
  def clusteredColumns(
      rng: Random,
      nCols: Int,
      colSize: Int,
      dim: Int,
      nClusters: Int = 5,
      jitter: Double = 0.08,
  ): IndexedSeq[ColumnVectors] = {
    val centers = IndexedSeq.fill(nClusters)(unitVec(rng, dim))
    (0 until nCols).map { c =>
      val vecs = Array.fill(colSize)(near(rng, centers(rng.nextInt(nClusters)), jitter))
      ColumnVectors(c, s"col$c", vecs)
    }
  }

  /** A query drawn from the same clusters as [[clusteredColumns]]. */
  def clusteredQuery(
      rng: Random,
      centers: IndexedSeq[Array[Double]],
      qSize: Int,
      jitter: Double = 0.08,
  ): Array[Array[Double]] =
    Array.fill(qSize)(near(rng, centers(rng.nextInt(centers.length)), jitter))

  /** Repository + query sharing cluster structure (for exactness tests). */
  def searchInstance(
      seed: Long,
      nCols: Int = 12,
      colSize: Int = 20,
      qSize: Int = 10,
      dim: Int = 8,
      nClusters: Int = 4,
  ): (IndexedSeq[ColumnVectors], Array[Array[Double]]) = {
    val rng = new Random(seed)
    val centers = IndexedSeq.fill(nClusters)(unitVec(rng, dim))
    val cols = (0 until nCols).map { c =>
      val vecs = Array.fill(colSize)(near(rng, centers(rng.nextInt(nClusters)), 0.12))
      ColumnVectors(c, s"col$c", vecs)
    }
    val query = Array.fill(qSize)(near(rng, centers(rng.nextInt(nClusters)), 0.12))
    (cols, query)
  }
}
