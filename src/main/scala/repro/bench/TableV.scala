package repro.bench

import org.apache.spark.sql.SparkSession
import repro.embed.HashingEmbedder
import repro.ml.{AirbnbTask, CompanyTask, Enrichment}

/** Table V — performance gain in ML tasks: (a) Airbnb price prediction
  * RMSE, (b) company classification micro-F1; both with match rate and
  * lift vs no-join / equi-join.
  */
object TableV {

  private def matchers: Seq[(String, Option[Enrichment.Matcher])] = Seq(
    "no-join"      -> None,
    "equi-join"    -> Some(Enrichment.EquiMatcher()),
    "Jaccard-join" -> Some(Enrichment.JaccardMatcher(0.7)),
    "fuzzy-join"   -> Some(Enrichment.FuzzyMatcher(0.7, delta = 0.75)),
    // tau just under the cross-entity distance floor (~0.76 measured):
    // covers every deterministic style + most misspellings, near-zero FPs
    "PEXESO"       -> Some(Enrichment.EmbeddingMatcher(new HashingEmbedder(64), tau = 0.68)),
  )

  /** Paper Table Va (RMSE) and Vb (micro-F1) reference values. */
  val paperA: Map[String, (String, Double)] = Map(
    "no-join" -> ("-", 221.82), "equi-join" -> ("8%", 223.20),
    "Jaccard-join" -> ("24%", 219.09), "fuzzy-join" -> ("38%", 216.67),
    "PEXESO" -> ("40%", 215.95))
  val paperB: Map[String, (String, Double)] = Map(
    "no-join" -> ("-", 0.825), "equi-join" -> ("0.13%", 0.806),
    "Jaccard-join" -> ("0.54%", 0.816), "fuzzy-join" -> ("0.83%", 0.836),
    "PEXESO" -> ("0.76%", 0.855))

  def run(spark: SparkSession): String = {
    val airbnb = AirbnbTask.generate()
    val aResults = matchers.map { case (name, m) =>
      name -> AirbnbTask.evaluate(spark, airbnb, m)
    }
    val aNoJoin = aResults.head._2.rmse
    val aEqui = aResults.find(_._1 == "equi-join").get._2.rmse
    def lift(base: Double, x: Double): String =
      if (base == 0) "-" else f"${100 * (base - x) / base}%+.2f%%"
    val aRows = aResults.map { case (name, r) =>
      val (pm, pv) = paperA(name)
      Seq(name,
        if (name == "no-join") "-" else Fmt.pct(r.matchRate),
        f"${r.rmse}%.2f",
        if (name == "no-join") "-" else lift(aNoJoin, r.rmse),
        if (name == "no-join" || name == "equi-join") "-" else lift(aEqui, r.rmse),
        pm, f"$pv%.2f")
    }

    val company = CompanyTask.generate()
    val bResults = matchers.map { case (name, m) =>
      name -> CompanyTask.evaluate(spark, company, m)
    }
    val bNoJoin = bResults.head._2.microF1
    val bEqui = bResults.find(_._1 == "equi-join").get._2.microF1
    def liftUp(base: Double, x: Double): String =
      if (base == 0) "-" else f"${100 * (x - base) / base}%+.2f%%"
    val bRows = bResults.map { case (name, r) =>
      val (pm, pv) = paperB(name)
      Seq(name,
        if (name == "no-join") "-" else Fmt.pct(r.matchRate),
        Fmt.f3(r.microF1),
        if (name == "no-join") "-" else liftUp(bNoJoin, r.microF1),
        if (name == "no-join" || name == "equi-join") "-" else liftUp(bEqui, r.microF1),
        pm, Fmt.f3(pv))
    }

    "(a) Airbnb price prediction\n" +
      Fmt.table(Seq("Method", "#Match", "RMSE", "Lift-vs-nojoin", "Lift-vs-equi",
        "Paper-#M", "Paper-RMSE"), aRows) +
      "\n\n(b) Company classification\n" +
      Fmt.table(Seq("Method", "#Match", "MicroF1", "Lift-vs-nojoin", "Lift-vs-equi",
        "Paper-#M", "Paper-F1"), bRows)
  }
}
