package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.core.ColumnVectors

class NaiveSearchSpec extends AnyFunSuite {

  test("early termination does not change the result") {
    for (seed <- 70L to 74L; t <- Seq(0.2, 0.5, 0.8)) {
      val (cols, query) = TestData.searchInstance(seed)
      val a = NaiveSearch.search(cols, query, 0.4, t, earlyTermination = true).joinable
      val b = NaiveSearch.search(cols, query, 0.4, t, earlyTermination = false).joinable
      assert(a == b, s"seed=$seed T=$t")
    }
  }

  test("early termination computes no more distances") {
    val (cols, query) = TestData.searchInstance(75, nCols = 15, colSize = 25)
    val a = NaiveSearch.search(cols, query, 0.4, 0.3, earlyTermination = true)
    val b = NaiveSearch.search(cols, query, 0.4, 0.3, earlyTermination = false)
    assert(a.distanceComputations <= b.distanceComputations)
  }

  test("joinability is the matched fraction") {
    val col = ColumnVectors(0, "c", Array(Array(1.0, 0.0), Array(0.0, 1.0)))
    val query = Array(Array(1.0, 0.0), Array(-1.0, 0.0))
    assert(NaiveSearch.joinability(col, query, 0.01) == 0.5)
    assert(NaiveSearch.joinability(col, query, 2.1) == 1.0)
  }

  test("a column is joinable iff its joinability reaches T") {
    val (cols, query) = TestData.searchInstance(76)
    for (tau <- Seq(0.2, 0.5); t <- Seq(0.3, 0.7)) {
      val res = NaiveSearch.search(cols, query, tau, t).joinable
      cols.foreach { c =>
        val jn = NaiveSearch.joinability(c, query, tau)
        assert(res.contains(c.colId) == (jn >= t - 1e-9), s"col=${c.colId} jn=$jn T=$t")
      }
    }
  }
}
