package repro.integration

import org.apache.spark.sql.SparkSession
import repro.core.{EmbeddingModel, NearestNeighbors, NodeNames}

/** Entity Resolution (§6, Algorithm 6): unsupervised matching of RID
  * embeddings. For every RID the `n_top` closest RIDs *of the other dataset*
  * form its candidate list; pairs are emitted when the closeness is mutual.
  * `n_top` trades precision for recall (paper Table 5): a short list only
  * allows strict mutual-first matches, a longer one lets second choices
  * match after their better candidates are taken.
  */
object EntityResolver {

  /** RID node names of a model that fall in the given rid range. */
  def ridsIn(model: EmbeddingModel, fromRid: Long, untilRid: Long): Seq[String] =
    model.words.iterator
      .filter(NodeNames.isRid)
      .filter { n => val r = NodeNames.ridValue(n); r >= fromRid && r < untilRid }
      .toSeq

  /** Match RIDs of dataset 1 (`rids1`) against dataset 2 (`rids2`).
    * Returns (rid1 node, rid2 node) pairs. NN search is Spark-parallel
    * (broadcast target matrix, see [[NearestNeighbors]]). */
  def matchRids(spark: SparkSession, model: EmbeddingModel,
                rids1: Seq[String], rids2: Seq[String],
                nTop: Int = 10, maxIterations: Int = 10): Seq[(String, String)] = {
    val vecs1 = rids1.flatMap(r => model.vector(r).map(r -> _))
    val vecs2 = rids2.flatMap(r => model.vector(r).map(r -> _))
    if (vecs1.isEmpty || vecs2.isEmpty) return Seq.empty

    // d(r_i) for both directions (Algorithm 6 line 3: i ≠ j).
    val top12 = NearestNeighbors.topK(spark, vecs1, vecs2, nTop)
    val top21 = NearestNeighbors.topK(spark, vecs2, vecs1, nTop)

    val sims: Map[(String, String), Double] =
      (top12.toSeq.flatMap { case (a, ns) => ns.map { case (b, s) => (a, b) -> s } } ++
       top21.toSeq.flatMap { case (b, ns) => ns.map { case (a, s) => (a, b) -> s } }).toMap

    // Candidate lists are exactly the n_top NN lists; reuse the shared
    // mutual-matching engine (Algorithm 6 lines 6–10 iterated to fixpoint).
    SchemaMatcher.mutualMatch(
      sims = sims,
      left = vecs1.map(_._1),
      right = vecs2.map(_._1),
      maxIterations = maxIterations,
      candidateCap = nTop,
    )
  }

  /** Algorithm 6 over a labeled candidate-pair set (the evaluation protocol
    * of the Magellan-style ER benchmarks the paper uses: classify blocking
    * candidates, not the full cross product). Candidate lists per RID are
    * its candidate partners ranked by embedding cosine, capped at `nTop`;
    * matching is the same mutual loop. Pairs whose RIDs lack embeddings are
    * unrankable and count against recall. */
  def resolveCandidates(model: EmbeddingModel,
                        candidates: Seq[(Long, Long, Boolean)],
                        nTop: Int = 10, maxIterations: Int = 10): (Seq[(Long, Long)], PRF) = {
    val sims: Map[(String, String), Double] = candidates.flatMap { case (a, b, _) =>
      model.cosine(NodeNames.rid(a), NodeNames.rid(b))
        .map(c => (NodeNames.rid(a), NodeNames.rid(b)) -> c)
    }.toMap
    val left = candidates.map(c => NodeNames.rid(c._1)).distinct
    val right = candidates.map(c => NodeNames.rid(c._2)).distinct
    val matched = SchemaMatcher.mutualMatch(sims, left, right, maxIterations, nTop)
      .map { case (a, b) => (NodeNames.ridValue(a), NodeNames.ridValue(b)) }
    val gt = candidates.collect { case (a, b, true) => (a, b) }.toSet
    (matched, Metrics.prf(matched.toSet, gt))
  }

  /** Convenience: resolve matches and score them against ground-truth rid
    * pairs (as plain longs). */
  def resolveAndScore(spark: SparkSession, model: EmbeddingModel,
                      rids1Range: (Long, Long), rids2Range: (Long, Long),
                      groundTruth: Set[(Long, Long)], nTop: Int = 10): (Seq[(Long, Long)], PRF) = {
    val pairs = matchRids(spark, model,
      ridsIn(model, rids1Range._1, rids1Range._2),
      ridsIn(model, rids2Range._1, rids2Range._2), nTop)
      .map { case (a, b) => (NodeNames.ridValue(a), NodeNames.ridValue(b)) }
    (pairs, Metrics.prf(pairs.toSet, groundTruth))
  }
}
