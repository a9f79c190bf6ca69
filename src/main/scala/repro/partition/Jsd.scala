package repro.partition

/** Jensen–Shannon divergence between probability distributions
  * (paper Section IV): the symmetrized KL divergence
  * `JSD(A‖B) = (KLD(A‖B) + KLD(B‖A)) / 2` as written in the paper.
  *
  * Inputs must be non-negative and sum to ~1 (ColumnHistogram signatures
  * are smoothed so every bin is strictly positive and KLD stays finite).
  */
object Jsd {

  def kld(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, "distribution length mismatch")
    var s = 0.0
    var i = 0
    while (i < a.length) {
      if (a(i) > 0) s += a(i) * math.log(a(i) / b(i))
      i += 1
    }
    s
  }

  /** Symmetrized KL, exactly the paper's JSD(A‖B) formula. */
  def jsd(a: Array[Double], b: Array[Double]): Double =
    (kld(a, b) + kld(b, a)) / 2.0
}
