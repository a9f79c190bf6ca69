package repro.core

import repro.embed.VectorOps

/** A set of pivot vectors and the pivot mapping (paper Section III-A).
  *
  * A vector `x` in the original metric space maps to
  * `x' = [d(p_1, x), …, d(p_|P|, x)]` in the pivot space. The triangle
  * inequality then gives two sound tests on mapped vectors alone:
  *
  *   - '''Lemma 1 (pivot filtering)''': if for some pivot i,
  *     `|q'[i] − x'[i]| > τ`, then `d(q, x) > τ` — x cannot match q.
  *   - '''Lemma 2 (pivot matching)''': if for some pivot i,
  *     `q'[i] + x'[i] ≤ τ`, then `d(q, x) ≤ τ` — x matches q for sure.
  *
  * Between these tests lies the candidate region that requires an exact
  * distance computation.
  */
final case class PivotSet(pivots: Array[Array[Double]]) extends Serializable {
  require(pivots.nonEmpty, "need at least one pivot")
  val numPivots: Int = pivots.length

  /** Pivot mapping: distances from x to every pivot. */
  def map(x: Array[Double]): Array[Double] = {
    val out = new Array[Double](numPivots)
    var i = 0
    while (i < numPivots) { out(i) = VectorOps.euclidean(pivots(i), x); i += 1 }
    out
  }

  def mapAll(xs: Array[Array[Double]]): Array[Array[Double]] = xs.map(map)
}

object PivotSpace {

  /** Lemma 1: true iff the mapped pair proves `d(q, x) > τ` (safe prune). */
  def filteredByPivots(qm: Array[Double], xm: Array[Double], tau: Double): Boolean = {
    var i = 0
    while (i < qm.length) {
      if (math.abs(qm(i) - xm(i)) > tau) return true
      i += 1
    }
    false
  }

  /** Lemma 2: true iff the mapped pair proves `d(q, x) ≤ τ` (sure match). */
  def matchedByPivots(qm: Array[Double], xm: Array[Double], tau: Double): Boolean = {
    var i = 0
    while (i < qm.length) {
      if (qm(i) + xm(i) <= tau) return true
      i += 1
    }
    false
  }
}
