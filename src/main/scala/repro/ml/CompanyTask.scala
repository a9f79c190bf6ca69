package repro.ml

import scala.util.Random
import org.apache.spark.ml.classification.RandomForestClassifier
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.lake.Entities

/** Company classification (paper Table Vb).
  *
  * Synthetic stand-in for the Kaggle company table (13 categories) joined
  * against an SWDC-like lake: a 1000-record query table keyed by dirty
  * company names, and lake columns carrying a numeric attribute correlated
  * with the company's category. The query's own features are weak; the
  * joined attribute is the strong signal, so classification quality tracks
  * match coverage — the paper's mechanism. Random forest, 4-fold CV,
  * micro-F1 (= accuracy for single-label multi-class).
  */
object CompanyTask {

  final case class Result(method: String, matchRate: Double, microF1: Double)

  final case class Data(
      queryNames: IndexedSeq[String],
      queryF1: IndexedSeq[Double],
      queryLabel: IndexedSeq[Int],
      lakeNames: IndexedSeq[String],
      lakeAttr: IndexedSeq[Double],
  )

  /** The lake columns partition the companies and carry systematic
    * representation styles (like the Airbnb sales tables), so equi-join
    * only matches the clean-style columns — the paper's tiny match rate —
    * while similarity matchers recover progressively more styles. The base
    * feature alone gives a reasonable classifier (paper no-join 0.825);
    * the joined attribute adds the last few percent.
    */
  def generate(
      numCategories: Int = 13,
      companiesPerCat: Int = 40,
      queryRows: Int = 1000,
      lakeRowsPerCompany: Int = 2,
      queryNoise: Double = 0.4,
      seed: Long = 505L,
  ): Data = {
    val rng = new Random(seed)
    val numCompanies = numCategories * companiesPerCat
    val companies = Entities.pool(Entities.DomainType.Company, numCompanies, seed)
    val category = IndexedSeq.tabulate(numCompanies)(_ % numCategories)

    val qn = IndexedSeq.newBuilder[String]
    val qf = IndexedSeq.newBuilder[Double]
    val ql = IndexedSeq.newBuilder[Int]
    (0 until queryRows).foreach { _ =>
      val c = rng.nextInt(numCompanies)
      qn += Entities.channel(companies(c), queryNoise, rng)
      // base feature: informative but imperfect category signal
      qf += category(c) + rng.nextGaussian() * 0.45
      ql += category(c)
    }

    // lake columns partition the companies; one systematic style each
    val styles = IndexedSeq(
      Entities.Style.Clean, Entities.Style.Decorate, Entities.Style.Upper,
      Entities.Style.Reformat, Entities.Style.Misspell(0.95))
    val perStyle = math.max(1, numCompanies / styles.size)
    val ln = IndexedSeq.newBuilder[String]
    val la = IndexedSeq.newBuilder[Double]
    (0 until numCompanies).foreach { c =>
      val style = styles(math.min(styles.size - 1, c / perStyle))
      (0 until lakeRowsPerCompany).foreach { _ =>
        ln += Entities.applyStyle(companies(c), style, rng)
        la += category(c) + rng.nextGaussian() * 0.4 // strong joined signal
      }
    }
    Data(qn.result(), qf.result(), ql.result(), ln.result(), la.result())
  }

  def evaluate(
      spark: SparkSession,
      data: Data,
      matcher: Option[Enrichment.Matcher],
  ): Result = {
    val (enriched, rate) = matcher match {
      case Some(m) => Enrichment.enrich(data.queryNames, data.lakeNames, data.lakeAttr, m)
      case None    => (IndexedSeq.fill(data.queryNames.length)(Option.empty[Double]), 0.0)
    }
    val defined = enriched.flatten
    val impute = if (defined.isEmpty) 0.0 else defined.sum / defined.size

    import spark.implicits._
    val rows = data.queryNames.indices.map { i =>
      (i, data.queryF1(i), enriched(i).getOrElse(impute), data.queryLabel(i).toDouble)
    }
    val df = rows.toDF("id", "f1", "attr", "label")
    val features = matcher match {
      case Some(_) => Array("f1", "attr")
      case None    => Array("f1")
    }
    val f1 = cvMicroF1(df, features, folds = 4)
    Result(matcher.map(_.name).getOrElse("no-join"), rate, f1)
  }

  /** k-fold CV micro-F1 (accuracy) of a random forest over `features`. */
  def cvMicroF1(df: DataFrame, features: Array[String], folds: Int): Double = {
    val assembler = new VectorAssembler().setInputCols(features).setOutputCol("features")
    val assembled = assembler.transform(df).withColumn("fold", col("id") % folds).cache()
    try {
      val scores = (0 until folds).map { f =>
        val train = assembled.filter(col("fold") =!= f)
        val test  = assembled.filter(col("fold") === f)
        val model = new RandomForestClassifier()
          .setLabelCol("label").setFeaturesCol("features")
          .setNumTrees(40).setMaxDepth(8).setSeed(7L)
          .fit(train)
        val pred = model.transform(test)
        pred.select(avg(when(col("prediction") === col("label"), 1.0).otherwise(0.0)))
          .head().getDouble(0)
      }
      scores.sum / folds
    } finally { assembled.unpersist(); () }
  }
}
