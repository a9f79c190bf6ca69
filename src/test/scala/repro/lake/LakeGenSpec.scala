package repro.lake

import org.scalatest.funsuite.AnyFunSuite
import repro.embed.HashingEmbedder

class LakeGenSpec extends AnyFunSuite {

  private val tinySpec = LakeGen.LakeSpec(
    dim = 16, sharedDomains = 4, colsPerShared = 3, distractors = 6,
    poolSize = 30, colSizeMin = 10, colSizeMax = 20, noise = 0.5, seed = 1L)

  test("lake has the expected column count") {
    val lake = LakeGen.generate(tinySpec)
    assert(lake.columns.size == 4 * 3 + 6)
  }

  test("column sizes respect bounds; values align with source entities") {
    val lake = LakeGen.generate(tinySpec)
    lake.columns.foreach { c =>
      assert(c.values.size >= tinySpec.colSizeMin && c.values.size <= tinySpec.colSizeMax)
      assert(c.values.size == c.sourceEntities.size)
    }
  }

  test("generation is deterministic") {
    val a = LakeGen.generate(tinySpec)
    val b = LakeGen.generate(tinySpec)
    assert(a.columns.map(_.values) == b.columns.map(_.values))
  }

  test("shared-domain columns overlap in source entities; distractors do not") {
    val lake = LakeGen.generate(tinySpec)
    val shared = lake.columns.filter(_.domainId == 0)
    assert(shared.size == 3)
    val overlap = shared(0).sourceEntities.toSet.intersect(shared(1).sourceEntities.toSet)
    assert(overlap.nonEmpty, "same-domain columns should share entities")
    val distractor = lake.columns.find(_.domainId >= 4).get
    assert(shared(0).sourceEntities.toSet.intersect(distractor.sourceEntities.toSet).isEmpty)
  }

  test("splitQueries removes the chosen columns from the lake") {
    val lake = LakeGen.generate(tinySpec)
    val (queries, rest) = LakeGen.splitQueries(lake, 3, seed = 2L)
    assert(queries.size == 3)
    assert(rest.columns.size == lake.columns.size - 3)
    queries.foreach(q => assert(!rest.columns.exists(_.colId == q.colId)))
  }

  test("ground truth: same-domain columns with high overlap are joinable; distractors never") {
    val lake = LakeGen.generate(tinySpec)
    val (queries, rest) = LakeGen.splitQueries(lake, 2, seed = 3L)
    queries.foreach { q =>
      val gt = LakeGen.groundTruth(q, rest, g = 0.3)
      gt.foreach { colId =>
        assert(rest.columns.find(_.colId == colId).get.domainId == q.domainId)
      }
    }
  }

  test("ground truth threshold is monotone") {
    val lake = LakeGen.generate(tinySpec)
    val (queries, rest) = LakeGen.splitQueries(lake, 1, seed = 4L)
    val loose = LakeGen.groundTruth(queries.head, rest, 0.2)
    val tight = LakeGen.groundTruth(queries.head, rest, 0.6)
    assert(tight.subsetOf(loose))
  }

  test("embed turns columns into unit-vector ColumnVectors") {
    val lake = LakeGen.generate(tinySpec)
    val emb = new HashingEmbedder(tinySpec.dim)
    val cvs = LakeGen.embed(lake.columns.take(3), emb)
    assert(cvs.size == 3)
    cvs.foreach { cv =>
      assert(cv.vectors.forall(v => math.abs(repro.embed.VectorOps.norm(v) - 1.0) < 1e-9))
    }
  }

  test("mini specs have the Table III shape relations") {
    val open = LakeGen.openMiniSpec()
    val swdc = LakeGen.swdcMiniSpec()
    val lwdc = LakeGen.lwdcMiniSpec()
    // OPEN: fewer, longer columns at higher dim; WDC: many short 50-d columns
    assert(open.dim > swdc.dim)
    assert(open.colSizeMin > swdc.colSizeMax)
    assert(swdc.dim == 50 && lwdc.dim == 50)
    val openCols = open.sharedDomains * open.colsPerShared + open.distractors
    val swdcCols = swdc.sharedDomains * swdc.colsPerShared + swdc.distractors
    val lwdcCols = lwdc.sharedDomains * lwdc.colsPerShared + lwdc.distractors
    assert(openCols < swdcCols && swdcCols < lwdcCols)
  }
}
