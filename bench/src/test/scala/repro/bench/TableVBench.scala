package repro.bench

import repro.SparkSpec

/** Table V — ML enrichment tasks. Asserts the paper's mechanism: match
  * coverage grows equi < Jaccard < fuzzy ≤ PEXESO, the similarity joins
  * beat no-join, and equi-join adds (almost) nothing.
  */
class TableVBench extends SparkSpec {

  test("Table V: Airbnb regression and company classification") {
    val out = TableV.run(spark)
    Fmt.publish("tableV", out)

    // re-derive the structured results for assertions
    val airbnb = repro.ml.AirbnbTask.generate()
    val company = repro.ml.CompanyTask.generate()
    val emb = new repro.embed.HashingEmbedder(64)

    val aEqui = repro.ml.AirbnbTask.evaluate(spark, airbnb, Some(repro.ml.Enrichment.EquiMatcher()))
    val aPex = repro.ml.AirbnbTask.evaluate(spark, airbnb,
      Some(repro.ml.Enrichment.EmbeddingMatcher(emb, 0.68)))
    val aNo = repro.ml.AirbnbTask.evaluate(spark, airbnb, None)
    assert(aPex.matchRate > 2 * aEqui.matchRate,
      s"PEXESO matches (${aPex.matchRate}) must dwarf equi (${aEqui.matchRate})")
    assert(aPex.rmse < aNo.rmse, "PEXESO enrichment must reduce RMSE vs no-join")
    assert(aPex.rmse < aEqui.rmse, "PEXESO enrichment must beat equi-join RMSE")

    val cEqui = repro.ml.CompanyTask.evaluate(spark, company, Some(repro.ml.Enrichment.EquiMatcher()))
    val cPex = repro.ml.CompanyTask.evaluate(spark, company,
      Some(repro.ml.Enrichment.EmbeddingMatcher(emb, 0.68)))
    val cNo = repro.ml.CompanyTask.evaluate(spark, company, None)
    assert(cPex.matchRate > 2 * cEqui.matchRate)
    assert(cPex.microF1 > cNo.microF1, "PEXESO enrichment must lift micro-F1 vs no-join")
    assert(cPex.microF1 > cEqui.microF1, "PEXESO enrichment must beat equi-join micro-F1")
    assert(math.abs(cEqui.microF1 - cNo.microF1) < 0.05,
      "equi-join adds (almost) nothing — the paper even reports a small degradation")
  }
}
