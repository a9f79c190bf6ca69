package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the bench plumbing (the heavy runs live in bench/). */
class BenchSpec extends AnyFunSuite {

  test("Fmt.table aligns columns under a dashed header") {
    val t = Fmt.table(Seq("a", "long"), Seq(Seq("xxxx", "1"), Seq("y", "22")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines(1).matches("[- ]+"))
    assert(lines.map(_.length).distinct.size == 1, "all lines equally wide")
  }

  test("Fmt numeric helpers") {
    assert(Fmt.ms(1_500_000L) == "1.5")
    assert(Fmt.sec(2_500_000_000L) == "2.50")
    assert(Fmt.pct(0.6) == "60%")
    assert(Fmt.f3(0.12345) == "0.123")
  }

  test("tauAbs maps the paper's percentages through the scale") {
    assert(BenchConfig.tauAbs(0.06) === 0.06 * 2.0 * BenchConfig.TauScale)
    assert(BenchConfig.TauPcts == Seq(0.02, 0.04, 0.06, 0.08))
    assert(BenchConfig.TFracs == Seq(0.2, 0.4, 0.6, 0.8))
  }

  test("TableIII.statsOf computes lake statistics") {
    val spec = repro.lake.LakeGen.LakeSpec(
      dim = 8, sharedDomains = 2, colsPerShared = 2, distractors = 1,
      poolSize = 10, colSizeMin = 4, colSizeMax = 6, noise = 0.5, seed = 3L)
    val s = TableIII.statsOf("tiny", spec, "hash")
    assert(s.numCol == 5)
    assert(s.numVec >= 20 && s.numVec <= 30)
    assert(s.dim == 8)
  }

  test("TableIII paper rows present") {
    assert(TableIII.paper.map(_.name) ==
      Seq("OPEN (paper)", "SWDC (paper)", "LWDC (paper)"))
  }

  test("TableIV paper reference covers all 10 (dataset, method) cells") {
    assert(TableIV.paper.size == 10)
    assert(TableIV.paper.keySet.map(_._1) == Set("OPEN", "SWDC"))
  }

  test("TableVII grid covers 16 cells per corpus") {
    assert(BenchConfig.TFracs.size * BenchConfig.TauPcts.size == 16)
  }

  test("resultsDir resolves under the repo root") {
    val d = Fmt.resultsDir
    assert(d.toString.endsWith("bench/results") || d.toString.endsWith("bench\\results"))
    assert(java.nio.file.Files.isDirectory(d))
  }
}
