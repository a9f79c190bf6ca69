package repro.core

/** Geometric predicates implementing Lemmas 3–6 (paper Section III-B).
  *
  * All tests operate on cell bounding boxes in the pivot space and are
  * conservative: "filter" only fires when no contained vector can match
  * the query (soundness of pruning), "match" only fires when every
  * contained vector must match (soundness of counting) — both follow from
  * Lemmas 1–2 applied to box extremes.
  */
object GridGeometry {

  type Node = HierarchicalGrid#GridNode

  /** Lemma 3 (vector–cell filtering): target cell `c` does not intersect
    * the square query region `SQR(q', τ)` — no vector in `c` matches `q`.
    */
  def vectorCellFiltered(c: Node, qm: Array[Double], tau: Double): Boolean = {
    var i = 0
    while (i < qm.length) {
      if (c.lo(i) > qm(i) + tau || c.hi(i) < qm(i) - tau) return true
      i += 1
    }
    false
  }

  /** Lemma 4 (cell–cell filtering): target cell `c` does not intersect the
    * inflated square region of query cell `cq`
    * (`SQR(cq.center, τ + cq.length/2)` = the cq box expanded by τ).
    */
  def cellCellFiltered(c: Node, cq: Node, tau: Double): Boolean = {
    var i = 0
    while (i < c.coords.length) {
      if (c.lo(i) > cq.hi(i) + tau || c.hi(i) < cq.lo(i) - tau) return true
      i += 1
    }
    false
  }

  /** Lemma 5 (vector–cell matching): some pivot i has the whole target box
    * inside the rectangle query region `RQR(q', p_i, τ) = [0, τ − q'[i]]`,
    * so every vector in `c` matches `q`.
    */
  def vectorCellMatched(c: Node, qm: Array[Double], tau: Double): Boolean = {
    var i = 0
    while (i < qm.length) {
      val edge = tau - qm(i)
      if (edge >= 0 && c.hi(i) <= edge) return true
      i += 1
    }
    false
  }

  /** Lemma 6 (cell–cell matching): some pivot i has the whole target box
    * inside the minimum RQR over all query vectors in `cq`, bounded by
    * `[0, τ − cq.hi(i)]` — every target vector matches every query vector.
    */
  def cellCellMatched(c: Node, cq: Node, tau: Double): Boolean = {
    var i = 0
    while (i < c.coords.length) {
      val edge = tau - cq.hi(i)
      if (edge >= 0 && c.hi(i) <= edge) return true
      i += 1
    }
    false
  }
}
