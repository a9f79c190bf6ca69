package repro.core

import scala.collection.immutable.ArraySeq
import scala.collection.mutable
import repro.core.HierarchicalGrid.CellKey

/** One indexed target vector: its column, its pivot-space image (for
  * Lemma 1/2 per-vector tests during verification) and the original
  * vector (for exact distance computation).
  */
final case class Posting(
    colId: Int,
    mapped: Array[Double],
    original: Array[Double],
) extends Serializable

/** Inverted index from leaf cells of `HG_SV` to column postings
  * (paper Section III-C, Fig. 4).
  *
  * Postings within a cell are sorted by column id — the DaaT
  * (document-at-a-time) order that lets verification process one column's
  * candidates together and apply the early-termination rules (joinability
  * reached, or Lemma 7 says the column can no longer reach `T`).
  */
final class InvertedIndex private (
    val postings: Map[CellKey, Array[Posting]],
    /** per cell: colId → [from, until) slice into the postings array */
    val colRanges: Map[CellKey, Map[Int, (Int, Int)]],
) extends Serializable {

  /** Distinct column ids with at least one vector in `cell`. */
  def columnsIn(cell: CellKey): Iterable[Int] =
    colRanges.getOrElse(cell, Map.empty).keys

  /** Postings of one column inside one cell (empty if absent). */
  def postingsOf(cell: CellKey, colId: Int): ArraySeq[Posting] =
    colRanges.get(cell).flatMap(_.get(colId)) match {
      case Some((from, until)) =>
        ArraySeq.unsafeWrapArray(java.util.Arrays.copyOfRange(postings(cell), from, until))
      case None => ArraySeq.empty
    }

  /** All postings of a cell (any column). */
  def postingsIn(cell: CellKey): Array[Posting] =
    postings.getOrElse(cell, Array.empty)

  def numCells: Int = postings.size
  def numPostings: Long = postings.valuesIterator.map(_.length.toLong).sum
}

object InvertedIndex {

  /** Build from (leaf cell, posting) pairs accumulated during indexing. */
  def build(entries: mutable.Map[CellKey, mutable.ArrayBuffer[Posting]]): InvertedIndex = {
    val posts  = Map.newBuilder[CellKey, Array[Posting]]
    val ranges = Map.newBuilder[CellKey, Map[Int, (Int, Int)]]
    entries.foreach { case (cell, buf) =>
      val sorted = buf.toArray.sortBy(_.colId)
      posts += cell -> sorted
      val r = Map.newBuilder[Int, (Int, Int)]
      var i = 0
      while (i < sorted.length) {
        val col = sorted(i).colId
        var j = i
        while (j < sorted.length && sorted(j).colId == col) j += 1
        r += col -> ((i, j))
        i = j
      }
      ranges += cell -> r.result()
    }
    new InvertedIndex(posts.result(), ranges.result())
  }
}
