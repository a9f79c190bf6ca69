package repro.ml

import scala.util.Random
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.regression.LinearRegression
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.lake.Entities

/** Airbnb price prediction (paper Table Va).
  *
  * Synthetic stand-in with the same join structure as NYC Airbnb + the NYC
  * house-sales mini-lake: a 1000-record query table whose "neighborhood"
  * column is dirty, five house-sales tables keyed by (differently dirty)
  * neighborhood names, and a price signal that is only recoverable through
  * the join — each neighborhood carries a latent value driving both the
  * listing price and the sales prices. Linear regression, 4-fold CV, RMSE.
  */
object AirbnbTask {

  final case class Result(method: String, matchRate: Double, rmse: Double)

  final case class Data(
      queryHoods: IndexedSeq[String],
      queryReviews: IndexedSeq[Double],
      queryMinNights: IndexedSeq[Double],
      queryPrice: IndexedSeq[Double],
      salesHoods: IndexedSeq[String],
      salesPrice: IndexedSeq[Double],
  )

  /** Generate the task data (deterministic in `seed`).
    *
    * The five sales tables partition the neighborhoods and each table has
    * a systematic representation style (clean / abbreviated / upper-case /
    * reformatted / misspelled) — the paper's heterogeneity ("Castle Hill"
    * vs "Castle Hill/Unionport"). Equi-join can only hit the clean table's
    * neighborhoods, which reproduces its tiny match rate; the similarity
    * matchers recover progressively more styles.
    */
  def generate(
      numHoods: Int = 40,
      queryRows: Int = 1000,
      salesPerHood: Int = 8,
      queryNoise: Double = 0.4,
      seed: Long = 404L,
  ): Data = {
    val rng = new Random(seed)
    val hoods = Entities.pool(Entities.DomainType.Neighborhood, numHoods, seed)
    val latent = IndexedSeq.tabulate(numHoods)(i =>
      (repro.embed.HashingEmbedder.splitmix64(seed + i) & 0xFFFF).toDouble / 0xFFFF)

    val qh = IndexedSeq.newBuilder[String]
    val qr = IndexedSeq.newBuilder[Double]
    val qm = IndexedSeq.newBuilder[Double]
    val qp = IndexedSeq.newBuilder[Double]
    (0 until queryRows).foreach { _ =>
      val h = rng.nextInt(numHoods)
      val reviews = rng.nextInt(300).toDouble
      qh += Entities.channel(hoods(h), queryNoise, rng)
      qr += reviews
      qm += (1 + rng.nextInt(30)).toDouble
      qp += 80.0 + 180.0 * latent(h) + 0.2 * reviews + rng.nextGaussian() * 15.0
    }

    // 5 sales tables, one per style, partitioning the neighborhoods
    val styles = IndexedSeq(
      Entities.Style.Clean, Entities.Style.Decorate, Entities.Style.Upper,
      Entities.Style.Reformat, Entities.Style.Misspell(0.95))
    val perTable = math.max(1, numHoods / styles.size)
    val sh = IndexedSeq.newBuilder[String]
    val sp = IndexedSeq.newBuilder[Double]
    (0 until numHoods).foreach { h =>
      val style = styles(math.min(styles.size - 1, h / perTable))
      (0 until salesPerHood).foreach { _ =>
        sh += Entities.applyStyle(hoods(h), style, rng)
        sp += 250.0 + 400.0 * latent(h) + rng.nextGaussian() * 30.0
      }
    }
    Data(qh.result(), qr.result(), qm.result(), qp.result(), sh.result(), sp.result())
  }

  /** Train + evaluate one method's enrichment; `matcher=None` is no-join. */
  def evaluate(
      spark: SparkSession,
      data: Data,
      matcher: Option[Enrichment.Matcher],
  ): Result = {
    val (enriched, rate) = matcher match {
      case Some(m) => Enrichment.enrich(data.queryHoods, data.salesHoods, data.salesPrice, m)
      case None    => (IndexedSeq.fill(data.queryHoods.length)(Option.empty[Double]), 0.0)
    }
    val defined = enriched.flatten
    val impute = if (defined.isEmpty) 0.0 else defined.sum / defined.size

    import spark.implicits._
    val rows = data.queryHoods.indices.map { i =>
      (i, data.queryReviews(i), data.queryMinNights(i),
        enriched(i).getOrElse(impute), data.queryPrice(i))
    }
    val df = rows.toDF("id", "reviews", "min_nights", "avg_sale", "price")

    val features = matcher match {
      case Some(_) => Array("reviews", "min_nights", "avg_sale")
      case None    => Array("reviews", "min_nights")
    }
    val rmse = cvRmse(df, features, folds = 4)
    Result(matcher.map(_.name).getOrElse("no-join"), rate, rmse)
  }

  /** k-fold CV RMSE of a linear regression over `features` → `price`. */
  def cvRmse(df: DataFrame, features: Array[String], folds: Int): Double = {
    val assembler = new VectorAssembler().setInputCols(features).setOutputCol("features")
    val assembled = assembler.transform(df).withColumn("fold", col("id") % folds).cache()
    try {
      val rmses = (0 until folds).map { f =>
        val train = assembled.filter(col("fold") =!= f)
        val test  = assembled.filter(col("fold") === f)
        val model = new LinearRegression()
          .setLabelCol("price").setFeaturesCol("features").setRegParam(0.1)
          .fit(train)
        val pred = model.transform(test)
        val mse = pred
          .select(avg(pow(col("prediction") - col("price"), 2.0)))
          .head().getDouble(0)
        math.sqrt(mse)
      }
      rmses.sum / folds
    } finally { assembled.unpersist(); () }
  }
}
