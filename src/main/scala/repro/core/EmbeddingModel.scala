package repro.core

/** In-memory embedding table with the vector-space operations the paper's
  * algorithms need: cosine similarity, nearest neighbours over a candidate
  * subset, and gensim's `doesnt_match` (used by the §7.1 MA/MR/MC quality
  * tests: normalize, average, return the word least similar to the mean).
  *
  * Vocabulary sizes here are graph-node counts (≤ a few 100k), so a
  * driver-side table broadcast to executors is the right representation;
  * bulk top-k queries go through [[NearestNeighbors]] which parallelises
  * over queries with Spark.
  */
final class EmbeddingModel(
    val words: Array[String],
    /** L2-normalized vectors, row-aligned with `words`. */
    val vectors: Array[Array[Float]],
) extends Serializable {

  @transient lazy val index: Map[String, Int] = words.zipWithIndex.toMap

  def dim: Int = if (vectors.isEmpty) 0 else vectors(0).length
  def size: Int = words.length
  def contains(w: String): Boolean = index.contains(w)
  def vector(w: String): Option[Array[Float]] = index.get(w).map(vectors)

  /** Cosine of two already-normalized vectors = dot product. */
  def cosine(a: Array[Float], b: Array[Float]): Double = EmbeddingModel.dot(a, b)

  def cosine(w1: String, w2: String): Option[Double] =
    for (a <- vector(w1); b <- vector(w2)) yield cosine(a, b)

  /** Mean of the (normalized) vectors of `ws`, itself re-normalized;
    * None if no word is in vocabulary. */
  def meanVector(ws: Seq[String]): Option[Array[Float]] = {
    val vs = ws.flatMap(vector)
    if (vs.isEmpty) None
    else {
      val m = new Array[Float](dim)
      vs.foreach { v => var i = 0; while (i < m.length) { m(i) += v(i); i += 1 } }
      Some(EmbeddingModel.normalize(m))
    }
  }

  /** gensim `doesnt_match`: the input word with the lowest cosine to the
    * mean of all input vectors. Words missing from the vocabulary are
    * skipped; None if fewer than 2 words are known. */
  def doesntMatch(ws: Seq[String]): Option[String] = {
    val known = ws.filter(contains)
    if (known.size < 2) return None
    meanVector(known).map { m =>
      known.minBy(w => cosine(vector(w).get, m))
    }
  }

  /** Top-k most similar candidates to `query` by cosine, descending. */
  def nearest(query: Array[Float], candidates: Iterable[String], k: Int,
              exclude: Set[String] = Set.empty): Seq[(String, Double)] =
    candidates.iterator
      .filterNot(exclude)
      .flatMap(c => vector(c).map(v => c -> cosine(query, v)))
      .toSeq.sortBy(-_._2).take(k)

  def nearestToWord(w: String, candidates: Iterable[String], k: Int): Seq[(String, Double)] =
    vector(w).map(nearest(_, candidates, k, exclude = Set(w))).getOrElse(Seq.empty)

  /** Restrict to a sub-vocabulary (e.g. only RID nodes). */
  def filterWords(p: String => Boolean): EmbeddingModel = {
    val kept = words.indices.filter(i => p(words(i)))
    new EmbeddingModel(kept.map(words).toArray, kept.map(vectors).toArray)
  }

  /** Merge with another model; on conflict `other` wins. */
  def ++(other: EmbeddingModel): EmbeddingModel = {
    val m = words.zip(vectors).toMap ++ other.words.zip(other.vectors).toMap
    val ws = m.keys.toArray.sorted
    new EmbeddingModel(ws, ws.map(m))
  }
}

object EmbeddingModel {

  def dot(a: Array[Float], b: Array[Float]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i).toDouble * b(i); i += 1 }
    s
  }

  def normalize(v: Array[Float]): Array[Float] = {
    val n = math.sqrt(dot(v, v))
    if (n == 0) v else v.map(x => (x / n).toFloat)
  }

  /** Build from raw (unnormalized) vectors. */
  def apply(pairs: Seq[(String, Array[Float])]): EmbeddingModel = {
    val sorted = pairs.sortBy(_._1)
    new EmbeddingModel(sorted.map(_._1).toArray, sorted.map(p => normalize(p._2)).toArray)
  }
}
