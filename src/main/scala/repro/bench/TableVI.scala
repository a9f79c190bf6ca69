package repro.bench

import repro.core.{CostModel, PexesoIndex, PivotSelection}
import repro.embed.HashingEmbedder
import repro.lake.LakeGen

/** Table VI — parameter tuning: index construction time, blocking time,
  * and total search time (block + verify) over |P| ∈ {1,3,5,7,9} ×
  * m ∈ {2,4,6,8} on OPEN-mini and SWDC-mini, plus the cost-model's
  * optimal m (Section III-E justification).
  */
object TableVI {

  val PivotGrid: Seq[Int] = Seq(1, 3, 5, 7, 9)
  val LevelGrid: Seq[Int] = Seq(2, 4, 6, 8)

  final case class Cell(p: Int, m: Int, indexNanos: Long, blockNanos: Long, totalNanos: Long)

  def runDataset(name: String, spec: LakeGen.LakeSpec): (Seq[Cell], Int) = {
    val lake = LakeGen.generate(spec)
    val (queries, rest) = LakeGen.splitQueries(lake, BenchConfig.NumQueries, seed = 21L)
    val embedder = new HashingEmbedder(spec.dim)
    val embCols = LakeGen.embed(rest.columns, embedder)
    val embQs = queries.map(q => embedder.embedAll(q.values))
    val tau = BenchConfig.tauAbs(BenchConfig.DefaultTauPct)
    val t = BenchConfig.DefaultTFrac

    val cells = for (p <- PivotGrid; m <- LevelGrid) yield {
      val index = PexesoIndex.build(embCols, p, m)
      var blockNs = 0L; var totalNs = 0L
      embQs.foreach { q =>
        val r = index.search(q, tau, t)
        blockNs += r.blockNanos
        totalNs += r.totalNanos
      }
      Cell(p, m, index.buildNanos, blockNs, totalNs)
    }

    // cost-model optimal m at the paper-optimal |P| for this dataset
    val pOpt = if (name == "OPEN") BenchConfig.OpenPivots else BenchConfig.SwdcPivots
    val sample = PivotSelection.sample(embCols.flatMap(_.vectors), 3000)
    val pivots = PivotSelection.pcaPivots(sample, pOpt)
    val cm = new CostModel(sample.map(pivots.map).toArray, pOpt)
    val workload = embQs.take(5).map(q => (pivots.mapAll(q), tau)).toSeq
    val (mOpt, _) = cm.optimalM(workload, mMax = 8, origDim = spec.dim)
    (cells, mOpt)
  }

  def run(): String = {
    val out = new StringBuilder
    Seq(("OPEN", BenchConfig.openMini), ("SWDC", BenchConfig.swdcMini)).foreach {
      case (name, spec) =>
        val (cells, mOpt) = runDataset(name, spec)
        val rows = cells.map { c =>
          Seq(c.p.toString, c.m.toString, Fmt.sec(c.indexNanos),
            Fmt.ms(c.blockNanos), Fmt.ms(c.totalNanos))
        }
        out ++= s"$name (tau=6%, T=60%)\n"
        out ++= Fmt.table(Seq("|P|", "m", "index(s)", "block(ms)", "block+verify(ms)"), rows)
        val best = cells.minBy(_.totalNanos)
        out ++= s"\nempirical optimum: |P|=${best.p}, m=${best.m}"
        out ++= s"   cost-model optimal m (at |P|=${if (name == "OPEN") BenchConfig.OpenPivots else BenchConfig.SwdcPivots}): $mOpt"
        out ++= s"\npaper optimum: ${if (name == "OPEN") "|P|=5, m=6 (cost-model m=5)" else "|P|=3, m=4 (cost-model m=4)"}\n\n"
    }
    out.result()
  }
}
