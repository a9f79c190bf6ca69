package repro.bench

import repro.lake.LakeGen

/** Table III — dataset statistics. Reports our mini stand-ins next to the
  * paper's corpora so the scale substitution is explicit.
  */
object TableIII {

  final case class Stats(name: String, numVec: Long, numCol: Int, avgVec: Double,
                         model: String, dim: Int)

  def statsOf(name: String, spec: LakeGen.LakeSpec, model: String): Stats = {
    val lake = LakeGen.generate(spec)
    Stats(name, lake.numVectors, lake.columns.size, lake.avgColSize, model, spec.dim)
  }

  /** Paper's Table III rows for reference. */
  val paper: Seq[Stats] = Seq(
    Stats("OPEN (paper)", 17_200_000L, 21_600, 796.0, "fastText", 300),
    Stats("SWDC (paper)", 8_600_000L, 516_000, 16.7, "GloVe", 50),
    Stats("LWDC (paper)", 602_000_000L, 48_900_000, 12.3, "GloVe", 50),
  )

  def run(): String = {
    val ours = Seq(
      statsOf("OPEN-mini", BenchConfig.openMini, "hash-ngram"),
      statsOf("SWDC-mini", BenchConfig.swdcMini, "hash-ngram"),
      statsOf("LWDC-mini", BenchConfig.lwdcMini, "hash-ngram"),
    )
    val rows = (paper ++ ours).map { s =>
      Seq(s.name, s.numVec.toString, s.numCol.toString, f"${s.avgVec}%.1f", s.model, s.dim.toString)
    }
    Fmt.table(Seq("Dataset", "#Vec", "#Col", "Avg#Vec", "Model", "Dim"), rows)
  }
}
