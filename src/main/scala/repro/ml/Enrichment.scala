package repro.ml

import repro.baselines.TextJoins
import repro.embed.{HashingEmbedder, VectorOps}

/** Record-level matchers used to left-join the query table with discovered
  * joinable tables (paper Section VI-C). One matcher per competitor:
  * equi, Jaccard, fuzzy — on raw strings — and the PEXESO matcher on
  * embedding distance. "no-join" is the absence of a matcher.
  */
object Enrichment {

  trait Matcher {
    def name: String
    /** Indices of `targets` matching the query value. */
    def matchIdx(q: String, targets: IndexedSeq[String]): Seq[Int]
  }

  final case class EquiMatcher() extends Matcher {
    val name = "equi-join"
    def matchIdx(q: String, ts: IndexedSeq[String]): Seq[Int] =
      ts.indices.filter(i => TextJoins.equiMatch(q, ts(i)))
  }

  final case class JaccardMatcher(theta: Double) extends Matcher {
    val name = "Jaccard-join"
    def matchIdx(q: String, ts: IndexedSeq[String]): Seq[Int] =
      ts.indices.filter(i => TextJoins.jaccard(q, ts(i)) >= theta)
  }

  final case class FuzzyMatcher(theta: Double, delta: Double = 0.8) extends Matcher {
    val name = "fuzzy-join"
    def matchIdx(q: String, ts: IndexedSeq[String]): Seq[Int] =
      ts.indices.filter(i => TextJoins.fuzzyJaccard(q, ts(i), delta) >= theta)
  }

  /** PEXESO record matching: embedding distance ≤ τ. Embeddings of target
    * values are precomputed once per column; query embeddings are cached.
    */
  final case class EmbeddingMatcher(embedder: HashingEmbedder, tau: Double) extends Matcher {
    val name = "PEXESO"
    private val cache = scala.collection.mutable.HashMap.empty[String, Array[Double]]
    private def emb(s: String): Array[Double] = cache.getOrElseUpdate(s, embedder.embed(s))
    def matchIdx(q: String, ts: IndexedSeq[String]): Seq[Int] = {
      val qv = emb(q)
      ts.indices.filter(i => VectorOps.euclidean(qv, emb(ts(i))) <= tau)
    }
  }

  /** Left-join enrichment: for each query key value, the mean of the
    * matched rows' numeric attribute, or None when nothing matched
    * (the caller imputes — the paper's sparsity mechanism).
    * Returns (enriched values, match rate).
    */
  def enrich(
      queryKeys: IndexedSeq[String],
      targetKeys: IndexedSeq[String],
      targetAttr: IndexedSeq[Double],
      matcher: Matcher,
  ): (IndexedSeq[Option[Double]], Double) = {
    require(targetKeys.length == targetAttr.length, "key/attr length mismatch")
    // matching is per distinct query value — memoized
    val memo = scala.collection.mutable.HashMap.empty[String, Option[Double]]
    val out = queryKeys.map { q =>
      memo.getOrElseUpdate(q, {
        val idx = matcher.matchIdx(q, targetKeys)
        if (idx.isEmpty) None else Some(idx.map(targetAttr).sum / idx.size)
      })
    }
    val rate = out.count(_.isDefined).toDouble / out.length
    (out, rate)
  }
}
