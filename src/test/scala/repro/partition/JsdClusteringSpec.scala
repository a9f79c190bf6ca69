package repro.partition

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import repro.TestData
import repro.core.ColumnVectors

class JsdClusteringSpec extends AnyFunSuite {

  private def bimodalColumns(seed: Long, perMode: Int): IndexedSeq[ColumnVectors] = {
    val rng = new Random(seed)
    val c1 = TestData.unitVec(rng, 6)
    val c2 = c1.map(-_)
    val a = (0 until perMode).map(i =>
      ColumnVectors(i, s"a$i", Array.fill(60)(TestData.near(rng, c1, 0.05))))
    val b = (0 until perMode).map(i =>
      ColumnVectors(perMode + i, s"b$i", Array.fill(60)(TestData.near(rng, c2, 0.05))))
    a ++ b
  }

  test("assignment covers every column with a valid cluster id") {
    val cols = bimodalColumns(1, 5)
    val assign = JsdClustering.cluster(cols, k = 3)
    assert(assign.length == cols.length)
    assert(assign.forall(c => c >= 0 && c < 3))
  }

  test("k=1 puts everything in one cluster") {
    val cols = bimodalColumns(2, 3)
    assert(JsdClustering.cluster(cols, 1).forall(_ == 0))
  }

  test("clustering is deterministic") {
    val cols = bimodalColumns(3, 4)
    assert(JsdClustering.cluster(cols, 2).toSeq == JsdClustering.cluster(cols, 2).toSeq)
  }

  test("columns with the same distribution end up together (k=2, bimodal)") {
    val cols = bimodalColumns(4, 6)
    val assign = JsdClustering.cluster(cols, 2, iterations = 8)
    val groupA = assign.take(6).toSet
    val groupB = assign.drop(6).toSet
    assert(groupA.size == 1 && groupB.size == 1 && groupA != groupB,
      s"expected clean bimodal split, got ${assign.toSeq}")
  }

  test("k larger than the column count still works") {
    val cols = bimodalColumns(5, 2)
    val assign = JsdClustering.cluster(cols, 10)
    assert(assign.length == cols.length)
  }
}
