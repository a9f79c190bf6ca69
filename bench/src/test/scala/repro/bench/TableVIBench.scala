package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table VI — |P| × m parameter sweep: index construction, blocking, and
  * total search time, plus the cost model's recommended m.
  */
class TableVIBench extends AnyFunSuite {

  test("Table VI: parameter tuning sweep on OPEN-mini and SWDC-mini") {
    val out = TableVI.run()
    Fmt.publish("tableVI", out)

    val (openCells, openMOpt) = TableVI.runDataset("OPEN", BenchConfig.openMini)
    assert(openCells.size == TableVI.PivotGrid.size * TableVI.LevelGrid.size)
    openCells.foreach { c =>
      assert(c.indexNanos > 0 && c.totalNanos > 0)
      assert(c.blockNanos <= c.totalNanos, "blocking is part of block+verify")
    }
    // paper: index construction time grows with |P|
    val byP = openCells.groupBy(_.p).view.mapValues(_.map(_.indexNanos).sum).toMap
    assert(byP(9) > byP(1), "more pivots => more expensive index construction")
    // cost-model m is in the sweep's range and interior (not a degenerate endpoint pick)
    assert(openMOpt >= 1 && openMOpt <= 8)
  }
}
