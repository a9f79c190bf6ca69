package repro.core

import repro.embed.VectorOps

/** PCA-based pivot selection (paper Section III-D, following Mao et al. [20]).
  *
  * Good pivots are outliers that scatter the mapped vectors. The PCA-based
  * method runs in O(|S_V|): compute the top principal components of (a
  * sample of) the vector collection with power iteration, then pick, for
  * each component, the vector with the extreme projection along it —
  * those are outliers in the directions of maximum variance.
  *
  * No external linear-algebra dependency: the covariance–vector product is
  * computed implicitly as X^T (X v) over the centered sample.
  */
object PivotSelection {

  /** Select `k` distinct pivots from `vectors` (or a sample thereof).
    *
    * @param vectors    candidate pool (pass a uniform sample for big lakes)
    * @param k          number of pivots (should stay below the original dim)
    * @param iterations power-iteration steps per principal component
    * @param seed       deterministic start vectors
    */
  def pcaPivots(
      vectors: IndexedSeq[Array[Double]],
      k: Int,
      iterations: Int = 20,
      seed: Long = 7L,
  ): PivotSet = {
    require(vectors.nonEmpty, "empty vector pool")
    require(k >= 1, "need k >= 1")
    val dim = vectors.head.length
    val mu  = VectorOps.mean(vectors)

    // Centered-projection helper: (x - mu) · v
    def proj(x: Array[Double], v: Array[Double]): Double = {
      var s = 0.0; var i = 0
      while (i < dim) { s += (x(i) - mu(i)) * v(i); i += 1 }
      s
    }

    val components = Array.newBuilder[Array[Double]]
    val comps = new scala.collection.mutable.ArrayBuffer[Array[Double]]

    var c = 0
    var rngState = seed
    while (c < math.min(k, dim)) {
      // deterministic pseudo-random start vector
      var v = Array.fill(dim) {
        rngState = repro.embed.HashingEmbedder.splitmix64(rngState)
        (rngState.toDouble / Long.MaxValue)
      }
      v = VectorOps.normalize(v)
      var it = 0
      while (it < iterations) {
        // w = Cov * v  (implicitly, up to 1/n scale):  sum_x ((x-mu)·v)(x-mu)
        val w = new Array[Double](dim)
        vectors.foreach { x =>
          val p = proj(x, v)
          var i = 0
          while (i < dim) { w(i) += p * (x(i) - mu(i)); i += 1 }
        }
        // deflate against previously found components
        comps.foreach { u =>
          val d = VectorOps.dot(w, u)
          var i = 0
          while (i < dim) { w(i) -= d * u(i); i += 1 }
        }
        val n = VectorOps.norm(w)
        if (n > 1e-12) v = w.map(_ / n)
        it += 1
      }
      comps += v
      c += 1
    }
    components ++= comps

    // One pivot per component: the vector with the maximum |projection|
    // (an outlier along that direction). De-duplicate; top up with the
    // farthest-from-chosen vectors if duplicates collapse the set.
    val chosen = scala.collection.mutable.LinkedHashSet.empty[Int]
    comps.foreach { u =>
      var best = -1; var bestAbs = -1.0
      var i = 0
      while (i < vectors.length) {
        if (!chosen.contains(i)) {
          val p = math.abs(proj(vectors(i), u))
          if (p > bestAbs) { bestAbs = p; best = i }
        }
        i += 1
      }
      if (best >= 0) chosen += best
    }
    while (chosen.size < k && chosen.size < vectors.length) {
      // farthest-first top-up for k > dim or degenerate data
      var best = -1; var bestD = -1.0
      var i = 0
      while (i < vectors.length) {
        if (!chosen.contains(i)) {
          var minD = Double.MaxValue
          chosen.foreach(j => minD = math.min(minD, VectorOps.euclidean(vectors(i), vectors(j))))
          if (minD > bestD) { bestD = minD; best = i }
        }
        i += 1
      }
      if (best < 0) return PivotSet(chosen.toArray.map(vectors(_).clone()))
      chosen += best
    }
    PivotSet(chosen.toArray.map(vectors(_).clone()))
  }

  /** Uniform deterministic sample of up to `maxSample` vectors. */
  def sample(vectors: IndexedSeq[Array[Double]], maxSample: Int): IndexedSeq[Array[Double]] =
    if (vectors.length <= maxSample) vectors
    else {
      val step = vectors.length.toDouble / maxSample
      (0 until maxSample).map(i => vectors((i * step).toInt))
    }
}
