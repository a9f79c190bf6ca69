package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.ColumnVectors
import repro.embed.VectorOps
import repro.partition.Jsd

/** Spark-side column histograms for the JSD partitioning (paper Section IV)
  * — the DataFrame version of `partition.ColumnHistogram` used when the
  * lake itself lives in a DataFrame.
  *
  * Each vector contributes `refs.length` (ref, bin) observations; the
  * per-column histogram is a `groupBy(col_id, ref, bin).count()` — pure
  * Catalyst — and only the (columns × refs × bins) counts come back to the
  * driver where the k-means-style JSD loop runs (k, iterations are tiny).
  */
object JsdClusteringSpark {

  /** `(col_id, sig)` — normalized smoothed signatures, one row per column. */
  def signatures(
      lakeDf: DataFrame,
      refs: Array[Array[Double]],
      bins: Int,
      maxDist: Double = VectorOps.MaxUnitDistance,
  ): Map[Int, Array[Double]] = {
    val spark = lakeDf.sparkSession
    val bRefs = spark.sparkContext.broadcast(refs)
    val w = maxDist / bins

    val binsU = udf { (v: Seq[Double]) =>
      val x = v.toArray
      bRefs.value.map { r =>
        math.min(bins - 1, math.max(0, (VectorOps.euclidean(x, r) / w).toInt))
      }.toSeq
    }

    val counts = lakeDf
      .select(col("col_id"), posexplode(binsU(col("vec"))).as(Seq("ref", "bin")))
      .groupBy("col_id", "ref", "bin")
      .count()
      .collect()

    val sigLen = refs.length * bins
    counts
      .groupBy(_.getInt(0))
      .map { case (colId, rows) =>
        val h = new Array[Double](sigLen)
        rows.foreach(r => h(r.getInt(1) * bins + r.getInt(2)) += r.getLong(3).toDouble)
        val total = h.sum + sigLen * 1e-3
        colId -> h.map(v => (v + 1e-3) / total)
      }
  }

  /** Cluster columns by JSD over Spark-computed signatures; returns
    * colId → cluster. Same loop as `partition.JsdClustering`.
    */
  def cluster(
      spark: SparkSession,
      columns: Seq[ColumnVectors],
      k: Int,
      iterations: Int = 5,
      refsCount: Int = 4,
      bins: Int = 16,
  ): Map[Int, Int] = {
    require(k >= 1, "need k >= 1")
    val refs = repro.partition.ColumnHistogram.referencePoints(columns, refsCount)
    val lakeDf = SparkPexeso.lakeToDF(spark, columns)
    val sigs = signatures(lakeDf, refs, bins)
    val ids = sigs.keys.toArray.sorted
    if (k == 1) return ids.map(_ -> 0).toMap

    val kk = math.min(k, ids.length)
    val step = math.max(1, ids.length / kk)
    var centers = Array.tabulate(kk)(i => sigs(ids(math.min(ids.length - 1, i * step))).clone())
    val assign = new Array[Int](ids.length)
    var it = 0
    while (it < iterations) {
      ids.indices.foreach { i =>
        assign(i) = centers.indices.minBy(c => Jsd.jsd(sigs(ids(i)), centers(c)))
      }
      val sums = Array.fill(kk)(new Array[Double](centers(0).length))
      val cnts = new Array[Int](kk)
      ids.indices.foreach { i =>
        VectorOps.addInPlace(sums(assign(i)), sigs(ids(i)))
        cnts(assign(i)) += 1
      }
      centers = Array.tabulate(kk) { c =>
        if (cnts(c) == 0) centers(c)
        else { val m = sums(c).map(_ / cnts(c)); val t = m.sum; m.map(_ / t) }
      }
      it += 1
    }
    ids.zipWithIndex.map { case (id, i) => id -> assign(i) }.toMap
  }
}
