package repro.ml

import repro.SparkSpec
import repro.embed.HashingEmbedder

/** Integration smoke for the Table V tasks at reduced size: the pipelines
  * must run end-to-end and exhibit the paper's mechanism — more correct
  * matches than equi-join for the similarity matcher.
  */
class TasksSpec extends SparkSpec {

  private val airbnb = AirbnbTask.generate(numHoods = 15, queryRows = 200, salesPerHood = 6)
  private val company = CompanyTask.generate(
    numCategories = 5, companiesPerCat = 10, queryRows = 200, lakeRowsPerCompany = 2)

  test("airbnb: no-join baseline runs and yields a finite RMSE") {
    val r = AirbnbTask.evaluate(spark, airbnb, None)
    assert(r.method == "no-join" && r.matchRate == 0.0)
    assert(r.rmse > 0 && r.rmse.isFinite)
  }

  test("airbnb: embedding matcher finds more matches than equi") {
    val equi = AirbnbTask.evaluate(spark, airbnb, Some(Enrichment.EquiMatcher()))
    val pex = AirbnbTask.evaluate(spark, airbnb,
      Some(Enrichment.EmbeddingMatcher(new HashingEmbedder(32), tau = 0.8)))
    assert(pex.matchRate > equi.matchRate, s"pex=${pex.matchRate} equi=${equi.matchRate}")
  }

  test("airbnb: a well-matched enrichment beats no-join RMSE") {
    val noJoin = AirbnbTask.evaluate(spark, airbnb, None)
    val pex = AirbnbTask.evaluate(spark, airbnb,
      Some(Enrichment.EmbeddingMatcher(new HashingEmbedder(32), tau = 0.8)))
    assert(pex.rmse < noJoin.rmse, s"pex=${pex.rmse} noJoin=${noJoin.rmse}")
  }

  test("company: pipelines run; embedding matcher out-matches equi") {
    val equi = CompanyTask.evaluate(spark, company, Some(Enrichment.EquiMatcher()))
    val pex = CompanyTask.evaluate(spark, company,
      Some(Enrichment.EmbeddingMatcher(new HashingEmbedder(32), tau = 0.8)))
    assert(equi.microF1 >= 0 && equi.microF1 <= 1)
    assert(pex.matchRate > equi.matchRate)
  }

  test("company: micro-F1 of the enriched model beats no-join") {
    val noJoin = CompanyTask.evaluate(spark, company, None)
    val pex = CompanyTask.evaluate(spark, company,
      Some(Enrichment.EmbeddingMatcher(new HashingEmbedder(32), tau = 0.8)))
    assert(pex.microF1 > noJoin.microF1, s"pex=${pex.microF1} noJoin=${noJoin.microF1}")
  }
}
