package repro.embed

/** Dense vector primitives used throughout the reproduction.
  *
  * Vectors are plain `Array[Double]` for cache-friendly inner loops; all
  * functions are allocation-free except [[VectorOps.normalize]]. The metric
  * everywhere is Euclidean distance, matching the paper's experiments
  * (Section VI-A: "We use Euclidean distance for the distance function").
  */
object VectorOps {

  /** Squared Euclidean distance. Hot path of every verification step. */
  def euclideanSq(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Euclidean distance d(a, b). */
  def euclidean(a: Array[Double], b: Array[Double]): Double =
    math.sqrt(euclideanSq(a, b))

  /** Inner product a·b. */
  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var s = 0.0
    var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  /** L2 norm ‖a‖. */
  def norm(a: Array[Double]): Double = math.sqrt(dot(a, a))

  /** Returns a fresh unit-length copy of `a` (zero vectors stay zero).
    *
    * The paper normalizes every embedding to unit length so the maximum
    * possible Euclidean distance is 2 and τ can be given as a percentage
    * of it (Section V).
    */
  def normalize(a: Array[Double]): Array[Double] = {
    val n = norm(a)
    if (n == 0.0) a.clone()
    else {
      val out = new Array[Double](a.length)
      var i = 0
      while (i < a.length) { out(i) = a(i) / n; i += 1 }
      out
    }
  }

  /** In-place a += b. */
  def addInPlace(a: Array[Double], b: Array[Double]): Unit = {
    require(a.length == b.length, s"dim mismatch: ${a.length} vs ${b.length}")
    var i = 0
    while (i < a.length) { a(i) += b(i); i += 1 }
  }

  /** Element-wise mean of a non-empty collection of vectors. */
  def mean(vs: Iterable[Array[Double]]): Array[Double] = {
    require(vs.nonEmpty, "mean of empty collection")
    val dim = vs.head.length
    val acc = new Array[Double](dim)
    var n = 0
    vs.foreach { v => addInPlace(acc, v); n += 1 }
    var i = 0
    while (i < dim) { acc(i) /= n; i += 1 }
    acc
  }

  /** Maximum Euclidean distance between two unit vectors. */
  val MaxUnitDistance: Double = 2.0
}
