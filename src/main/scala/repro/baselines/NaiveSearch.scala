package repro.baselines

import repro.core.{ColumnVectors, SearchResult, Verify}
import repro.embed.VectorOps

/** Exhaustive joinable-column search — the correctness reference every
  * exact method (PEXESO, CTREE, EPT) is asserted against, and the "naive"
  * cost bound of paper Section III (|Q| · Σ|S| distance computations).
  *
  * With `earlyTermination` it also gets the column-level skip the paper
  * grants all competitors (stop a column once its match count reaches T).
  */
object NaiveSearch {

  def search(
      columns: Seq[ColumnVectors],
      query: Array[Array[Double]],
      tau: Double,
      tFrac: Double,
      earlyTermination: Boolean = true,
  ): SearchResult = {
    val tAbs = Verify.absThreshold(tFrac, query.length)
    var dist = 0L
    val t0 = System.nanoTime()
    val joinable = Set.newBuilder[Int]

    columns.foreach { col =>
      var matchedCount = 0
      var q = 0
      var done = false
      while (q < query.length && !done) {
        // Lemma-7-style bound: remaining queries cannot reach T anymore.
        if (earlyTermination && matchedCount + (query.length - q) < tAbs) done = true
        else {
          val qv = query(q)
          var i = 0
          var found = false
          while (i < col.vectors.length && !found) {
            dist += 1
            if (VectorOps.euclidean(qv, col.vectors(i)) <= tau) found = true
            i += 1
          }
          if (found) {
            matchedCount += 1
            if (earlyTermination && matchedCount >= tAbs) done = true
          }
          q += 1
        }
      }
      if (matchedCount >= tAbs) joinable += col.colId
    }

    val t1 = System.nanoTime()
    SearchResult(joinable.result(), 0L, t1 - t0, dist, 0L, 0L)
  }

  /** Exact joinability jn(Q, S) — fraction of query vectors with a match. */
  def joinability(col: ColumnVectors, query: Array[Array[Double]], tau: Double): Double = {
    val matchedCount = query.count { qv =>
      col.vectors.exists(x => VectorOps.euclidean(qv, x) <= tau)
    }
    matchedCount.toDouble / query.length
  }
}
