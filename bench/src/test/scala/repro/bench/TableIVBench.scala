package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table IV — precision & recall of joinable table search.
  *
  * Asserts the paper's qualitative claims: equi-join has the highest
  * precision but by far the lowest recall; PEXESO has the highest recall
  * with high (>0.8) precision; the PQ-85 approximation loses precision.
  */
class TableIVBench extends AnyFunSuite {

  private def score(rows: Seq[Seq[String]], method: String): (Double, Double) = {
    val r = rows.find(_(1) == method).get
    (r(2).toDouble, r(3).toDouble)
  }

  test("Table IV: effectiveness on OPEN-eff and SWDC-eff") {
    val openRows = TableIV.runDataset("OPEN", BenchConfig.openEff)
    val swdcRows = TableIV.runDataset("SWDC", BenchConfig.swdcEff)
    val out = Fmt.table(
      Seq("Dataset", "Method", "Precision", "Recall", "Paper-P", "Paper-R"),
      openRows ++ swdcRows)
    Fmt.publish("tableIV", out)

    Seq(openRows, swdcRows).foreach { rows =>
      val (equiP, equiR) = score(rows, "equi-join")
      val (_, jacR) = score(rows, "Jaccard-join")
      val (_, fuzR) = score(rows, "fuzzy-join")
      val (pexP, pexR) = score(rows, "PEXESO")
      val (pqP, _) = score(rows, "PQ-85")

      assert(equiR < jacR && equiR < fuzR && equiR < pexR,
        "equi-join must have the lowest recall")
      assert(pexR >= fuzR - 0.05 && pexR >= jacR - 0.05,
        "PEXESO recall must be at (or near) the top")
      assert(pexR - equiR >= 0.2, "PEXESO's recall advantage over equi-join (paper: +0.21..0.28)")
      assert(equiP >= 0.8, "equi-join precision should be near 1")
      assert(pexP >= 0.8, "PEXESO precision should be high (paper: >0.9)")
      assert(pqP < pexP, "the PQ-85 approximation must lose precision vs exact PEXESO")
    }
  }
}
