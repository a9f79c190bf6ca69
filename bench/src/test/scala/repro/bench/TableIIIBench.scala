package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table III — dataset statistics of the mini corpora vs the paper's. */
class TableIIIBench extends AnyFunSuite {

  test("Table III: generate, publish, and check corpus shape relations") {
    val out = TableIII.run()
    Fmt.publish("tableIII", out)

    val open = TableIII.statsOf("OPEN-mini", BenchConfig.openMini, "hash-ngram")
    val swdc = TableIII.statsOf("SWDC-mini", BenchConfig.swdcMini, "hash-ngram")
    val lwdc = TableIII.statsOf("LWDC-mini", BenchConfig.lwdcMini, "hash-ngram")

    // the paper's corpus shape: OPEN has few long columns at high dim;
    // the WDC corpora have many short 50-d columns; LWDC is the largest
    assert(open.avgVec > 5 * swdc.avgVec)
    assert(open.dim > swdc.dim && swdc.dim == 50 && lwdc.dim == 50)
    assert(open.numCol < swdc.numCol && swdc.numCol < lwdc.numCol)
    assert(lwdc.numVec > 4 * swdc.numVec)
    assert(math.abs(swdc.avgVec - 12.3) / 12.3 < 0.4, "SWDC-mini avg col size near paper's")
  }
}
