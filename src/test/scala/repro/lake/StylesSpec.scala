package repro.lake

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.embed.{HashingEmbedder, VectorOps}

class StylesSpec extends AnyFunSuite {
  import Entities._

  private val rng = new Random(1)

  test("Clean style is the identity") {
    assert(applyStyle("Castle Hill", Style.Clean, rng) == "Castle Hill")
  }

  test("Upper style upper-cases deterministically") {
    assert(applyStyle("Castle Hill", Style.Upper, rng) == "CASTLE HILL")
  }

  test("Abbrev style abbreviates known full forms") {
    assert(applyStyle("616 East 9th Street, 4W", Style.Abbrev, rng) == "616 E. 9th St., 4W")
    assert(applyStyle("Acme Incorporated", Style.Abbrev, rng) == "Acme Inc.")
  }

  test("Reformat style reverses comma parts") {
    assert(applyStyle("414 East 10th Street, 4E", Style.Reformat, rng) ==
      "4E, 414 East 10th Street")
  }

  test("Reformat style reorders words when there is no comma") {
    assert(applyStyle("Tom Keslin", Style.Reformat, rng) == "Keslin Tom")
    assert(applyStyle("Solo", Style.Reformat, rng) == "Solo")
  }

  test("Decorate style appends a deterministic tag") {
    val a = applyStyle("Castle Hill", Style.Decorate, rng)
    val b = applyStyle("Castle Hill", Style.Decorate, rng)
    assert(a == b)
    assert(a.startsWith("Castle Hill / "))
  }

  test("Misspell style perturbs with the given probability") {
    val outs = (1 to 500).map(_ => applyStyle("Castle Hill", Style.Misspell(0.5), rng))
    val dirty = outs.count(_ != "Castle Hill")
    assert(dirty > 150 && dirty < 350, s"dirty=$dirty")
    assert((1 to 20).forall(_ => applyStyle("Castle Hill", Style.Misspell(0.0), rng) == "Castle Hill"))
  }

  test("pickStyle favours Clean and is exhaustive over styles") {
    val rng2 = new Random(2)
    val picks = (1 to 2000).map(_ => pickStyle(rng2, 0.9))
    val clean = picks.count(_ == Style.Clean)
    assert(clean > 900 && clean < 1300, s"clean=$clean")
    assert(picks.toSet.size >= 4, "should draw several distinct styles")
  }

  test("deterministic styles embed at distance zero (the PEXESO edge)") {
    val emb = new HashingEmbedder(32)
    val base = emb.embed("616 East 9th Street, 4W")
    Seq(Style.Upper, Style.Abbrev, Style.Reformat).foreach { st =>
      val d = VectorOps.euclidean(base, emb.embed(applyStyle("616 East 9th Street, 4W", st, rng)))
      assert(d < 1e-9, s"$st should embed identically")
    }
  }

  test("Decorate embeds nearby but not identical") {
    val emb = new HashingEmbedder(32)
    val d = VectorOps.euclidean(
      emb.embed("Castle Hill"),
      emb.embed(applyStyle("Castle Hill", Style.Decorate, rng)))
    assert(d > 0.1 && d < 0.9, s"decorate distance $d")
  }
}
