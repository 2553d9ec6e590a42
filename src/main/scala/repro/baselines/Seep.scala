package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.core.{EmbeddingModel, NodeNames, Tokenization}
import repro.integration.SchemaMatcher

/** Stand-in for SEEP ("Seeping Semantics", ICDE'18) — the existing
  * embedding-based schema-matching system of Table 3.
  *
  * SEEP links attributes by combining the embedding of the attribute *label*
  * with an embedding signature of the attribute's *instances*; the paper
  * stresses that `SeepP`'s quality tracks the quality of the labels. We keep
  * that architecture: per column, signature = (label vector, instance
  * centroid); cross-column similarity = `labelWeight·cos(labels) +
  * (1−labelWeight)·cos(centroids)`; matching = the same two-sweep mutual
  * matching used everywhere.
  *
  *  - [[runPretrained]] (SeepP): both parts from the pre-trained space.
  *  - [[runLocal]] (SeepL): instance centroids and CID vectors from EmbDI
  *    local embeddings (labels contribute nothing — EmbDI vectors "do not
  *    depend on the presence of the attribute labels").
  */
object Seep {

  final case class Signature(label: Array[Float], centroid: Array[Float])

  private def centroid(vectors: Seq[Array[Float]], dim: Int): Array[Float] = {
    val acc = new Array[Float](dim)
    vectors.foreach { v => var i = 0; while (i < dim) { acc(i) += v(i); i += 1 } }
    EmbeddingModel.normalize(acc)
  }

  private def columnValues(df: DataFrame, c: String): Seq[String] =
    df.select(c).collect().flatMap(r => Option(r.get(0)).map(_.toString)).toSeq

  /** SeepP: pre-trained vectors for labels and instance tokens. */
  def runPretrained(d1: DataFrame, d2: DataFrame, labelWeight: Double = 0.5,
                    dim: Int = PretrainedEmbeddings.DefaultDim): Seq[(String, String)] = {
    def sig(df: DataFrame, c: String): Signature = {
      val toks = columnValues(df, c)
        .flatMap(v => Tokenization.tokens(v, Tokenization.Flatten)).distinct
      Signature(
        label = PretrainedEmbeddings.tokenVector(c.toLowerCase, dim),
        centroid =
          if (toks.isEmpty) new Array[Float](dim)
          else centroid(toks.map(PretrainedEmbeddings.tokenVector(_, dim)), dim))
    }
    matchBySignatures(
      d1.columns.filterNot(_ == "__rid").toSeq.map(c => c -> sig(d1, c)),
      d2.columns.filterNot(_ == "__rid").toSeq.map(c => c -> sig(d2, c)),
      labelWeight)
  }

  /** SeepL: EmbDI local embeddings — CID vector (if learned) blended with
    * the instance centroid; labels carry no signal in a local space. */
  def runLocal(d1: DataFrame, d2: DataFrame, model: EmbeddingModel,
               strategy: Tokenization.Strategy): Seq[(String, String)] = {
    val dim = model.dim
    def sig(df: DataFrame, dsIdx: Int, c: String): Signature = {
      val toks = columnValues(df, c).flatMap(v => Tokenization.tokens(v, strategy)).distinct
      val cen = centroid(toks.flatMap(model.vector), dim)
      val cid = model.vector(NodeNames.cid(dsIdx, c)).getOrElse(cen)
      Signature(label = cid, centroid = cen)
    }
    matchBySignatures(
      d1.columns.filterNot(_ == "__rid").toSeq.map(c => c -> sig(d1, 1, c)),
      d2.columns.filterNot(_ == "__rid").toSeq.map(c => c -> sig(d2, 2, c)),
      labelWeight = 0.5)
  }

  /** Minimum combined similarity for a candidate pair to be considered at
    * all — SEEP only links attributes above a confidence threshold; without
    * one, mutual matching on pure noise still emits a full permutation. */
  val MinSim = 0.35

  private def matchBySignatures(s1: Seq[(String, Signature)], s2: Seq[(String, Signature)],
                                labelWeight: Double): Seq[(String, String)] = {
    val sims = (for {
      (c1, a) <- s1; (c2, b) <- s2
      sim = labelWeight * EmbeddingModel.dot(a.label, b.label) +
        (1 - labelWeight) * EmbeddingModel.dot(a.centroid, b.centroid)
      if sim >= MinSim
    } yield (c1, c2) -> sim).toMap
    SchemaMatcher.mutualMatch(sims, s1.map(_._1), s2.map(_._1),
      maxIterations = 2, candidateCap = Int.MaxValue)
  }
}
