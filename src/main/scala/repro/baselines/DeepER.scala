package repro.baselines

import org.apache.spark.ml.classification.LogisticRegression
import org.apache.spark.ml.linalg.Vectors
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{EmbeddingModel, NearestNeighbors, Tokenization}
import repro.integration.{Metrics, PRF}

import scala.util.Random

/** Stand-in for DeepER (PVLDB'18) — the supervised ER system of Table 4.
  *
  * Architecture kept from the DeepER paper's "composition" variant: a tuple
  * is represented per attribute by the average of its token embeddings; a
  * candidate pair becomes a similarity-feature vector (per aligned attribute
  * the cosine of the two attribute vectors, plus the whole-tuple cosine);
  * a classifier is trained on a small labeled sample (paper: 5 % of ground
  * truth). Blocking = top-k tuple-embedding nearest neighbours.
  *
  *  - `DeepERP`: features from the pre-trained space.
  *  - `DeepERL`: features from EmbDI local token embeddings.
  *  - `tuned = true` reproduces the "task specific" columns: the §7.2
  *    fine-tuning (an extra learned weight matrix over the embedding lookup)
  *    is substituted by a degree-2 feature expansion, giving the classifier
  *    the same extra capacity to reshape the embedding space for ER.
  */
object DeepER {

  final case class Config(
      labelFraction: Double = 0.05,
      tuned: Boolean = false,
      blockingTopK: Int = 10,
      seed: Long = 31337L,
  )

  /** Per-rid attribute vectors + tuple vector from token embeddings. */
  private def tupleVectors(df: DataFrame, cols: Seq[String], model: EmbeddingModel,
                           strategy: Tokenization.Strategy)
      : Map[Long, (Array[Array[Float]], Array[Float])] = {
    val dim = model.dim
    df.collect().map { r =>
      val rid = r.getAs[Long]("__rid")
      val attrVecs = cols.map { c =>
        val toks = Option(r.getAs[Any](c)).toSeq
          .flatMap(v => Tokenization.tokens(v.toString, strategy))
        val vs = toks.flatMap(model.vector)
        if (vs.isEmpty) new Array[Float](dim)
        else {
          val acc = new Array[Float](dim)
          vs.foreach { v => var i = 0; while (i < dim) { acc(i) += v(i); i += 1 } }
          EmbeddingModel.normalize(acc)
        }
      }.toArray
      val tup = {
        val acc = new Array[Float](dim)
        attrVecs.foreach { v => var i = 0; while (i < dim) { acc(i) += v(i); i += 1 } }
        EmbeddingModel.normalize(acc)
      }
      rid -> (attrVecs, tup)
    }.toMap
  }

  private def features(a: (Array[Array[Float]], Array[Float]),
                       b: (Array[Array[Float]], Array[Float]),
                       tuned: Boolean): Array[Double] = {
    val attrCos = a._1.zip(b._1).map { case (x, y) => EmbeddingModel.dot(x, y) }
    val base = attrCos :+ EmbeddingModel.dot(a._2, b._2)
    if (!tuned) base
    else {
      // Degree-2 expansion: squares + pairwise products.
      val sq = base.map(x => x * x)
      val cross = for (i <- base.indices; j <- i + 1 until base.length) yield base(i) * base(j)
      base ++ sq ++ cross
    }
  }

  /** Run supervised ER over a scenario's aligned columns. Returns the PRF
    * over the ground-truth pairs not used for training. */
  /** Run supervised ER. `candidatePairs`, when provided, is the labeled
    * candidate set of the benchmark (the Magellan protocol: classify
    * blocking candidates); otherwise candidates come from internal top-k
    * tuple-embedding blocking. */
  def run(spark: SparkSession, d1: DataFrame, d2: DataFrame,
          alignedCols: Seq[(String, String)], model: EmbeddingModel,
          strategy: Tokenization.Strategy, groundTruth: Set[(Long, Long)],
          cfg: Config = Config(),
          candidatePairs: Option[Seq[(Long, Long, Boolean)]] = None): PRF = {
    val rng = new Random(cfg.seed)
    val v1 = tupleVectors(d1, alignedCols.map(_._1), model, strategy)
    val v2 = tupleVectors(d2, alignedCols.map(_._2), model, strategy)

    val candidates: Set[(Long, Long)] = candidatePairs match {
      case Some(pairs) => pairs.map(p => (p._1, p._2)).toSet
      case None =>
        // Blocking: top-k NN on tuple vectors, both directions.
        val q1 = v1.toSeq.map { case (r, (_, t)) => r.toString -> t }
        val q2 = v2.toSeq.map { case (r, (_, t)) => r.toString -> t }
        val nn12 = NearestNeighbors.topK(spark, q1, q2, cfg.blockingTopK)
        val nn21 = NearestNeighbors.topK(spark, q2, q1, cfg.blockingTopK)
        nn12.toSeq.flatMap { case (a, ns) => ns.map(n => (a.toLong, n._1.toLong)) }.toSet ++
          nn21.toSeq.flatMap { case (b, ns) => ns.map(n => (n._1.toLong, b.toLong)) }.toSet
    }

    // Label split: labelFraction of GT positives (+ negatives) for training.
    val positives = groundTruth.toSeq.sortBy(identity)
    val nTrainPos = math.max(1, (positives.size * cfg.labelFraction).round.toInt)
    val trainPos = rng.shuffle(positives).take(nTrainPos).toSet
    val negatives = candidates.diff(groundTruth).toSeq.sortBy(identity)
    val trainNeg = rng.shuffle(negatives).take(nTrainPos * 3).toSet

    def featRow(p: (Long, Long)): Option[Array[Double]] =
      for (a <- v1.get(p._1); b <- v2.get(p._2)) yield features(a, b, cfg.tuned)

    import spark.implicits._
    val trainRows = (trainPos.toSeq.map(p => (p, 1.0)) ++ trainNeg.toSeq.map(p => (p, 0.0)))
      .flatMap { case (p, y) => featRow(p).map(f => (y, Vectors.dense(f))) }
    if (trainRows.isEmpty || trainRows.map(_._1).distinct.size < 2) return PRF(0, 0)
    val train = trainRows.toDF("label", "features")

    val lr = new LogisticRegression().setMaxIter(60).setRegParam(1e-4)
    val lrModel = lr.fit(train)

    // Score every non-training candidate pair.
    val testPairs = (candidates ++ groundTruth).diff(trainPos).diff(trainNeg).toSeq.sortBy(identity)
    val test = testPairs.flatMap(p => featRow(p).map(f => (p._1, p._2, Vectors.dense(f))))
      .toDF("r1", "r2", "features")
    val pred = lrModel.transform(test)
      .select("r1", "r2", "prediction").collect()
      .filter(_.getDouble(2) >= 0.5)
      .map(r => (r.getLong(0), r.getLong(1))).toSet

    Metrics.prf(pred, groundTruth.diff(trainPos))
  }
}
