package repro.spark

import scala.util.Random
import repro.{SparkSpec, TestData}
import repro.partition.ColumnHistogram

class JsdClusteringSparkSpec extends SparkSpec {

  test("Spark-computed signatures equal the driver-side histograms") {
    val rng = new Random(1)
    val cols = TestData.clusteredColumns(rng, nCols = 6, colSize = 15, dim = 6)
    val refs = ColumnHistogram.referencePoints(cols, 3)
    val lakeDf = SparkPexeso.lakeToDF(spark, cols)
    val sparkSigs = JsdClusteringSpark.signatures(lakeDf, refs, bins = 8)
    cols.foreach { c =>
      val local = ColumnHistogram.signature(c, refs, 8)
      val dist = sparkSigs(c.colId)
      local.indices.foreach { i =>
        assert(math.abs(local(i) - dist(i)) < 1e-9, s"col=${c.colId} bin=$i")
      }
    }
  }

  test("cluster returns a valid assignment for every column") {
    val rng = new Random(2)
    val cols = TestData.clusteredColumns(rng, nCols = 10, colSize = 10, dim = 6)
    val assign = JsdClusteringSpark.cluster(spark, cols, k = 3)
    assert(assign.size == 10)
    assert(assign.values.forall(c => c >= 0 && c < 3))
  }

  test("k=1 puts everything together") {
    val rng = new Random(3)
    val cols = TestData.clusteredColumns(rng, nCols = 5, colSize = 8, dim = 6)
    assert(JsdClusteringSpark.cluster(spark, cols, 1).values.forall(_ == 0))
  }

  test("Spark clustering agrees with driver-side clustering on a bimodal lake") {
    val rng = new Random(4)
    val c1 = TestData.unitVec(rng, 6)
    val c2 = c1.map(-_)
    val cols = (0 until 4).map(i => repro.core.ColumnVectors(i, s"a$i",
      Array.fill(40)(TestData.near(rng, c1, 0.05)))) ++
      (0 until 4).map(i => repro.core.ColumnVectors(4 + i, s"b$i",
        Array.fill(40)(TestData.near(rng, c2, 0.05))))
    val assign = JsdClusteringSpark.cluster(spark, cols, 2, iterations = 8)
    val a = (0 until 4).map(assign(_)).toSet
    val b = (4 until 8).map(assign(_)).toSet
    assert(a.size == 1 && b.size == 1 && a != b, s"assign=$assign")
  }
}
