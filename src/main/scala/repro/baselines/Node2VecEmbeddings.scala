package repro.baselines

import org.apache.spark.sql.SparkSession
import repro.core.{CompactGraph, EmbeddingModel, EmbeddingTrainer, Node2VecWalker}

/** The Node2Vec baseline of §7: node2vec's second-order walks over the same
  * tripartite graph ("given our graph as input, it learns vectors for all
  * nodes"), then the same Word2Vec training. Default p = q = 1 as in the
  * node2vec paper's defaults.
  */
object Node2VecEmbeddings {

  final case class Config(
      n2v: Node2VecWalker.N2VConfig = Node2VecWalker.N2VConfig(),
      w2v: EmbeddingTrainer.W2VConfig = EmbeddingTrainer.W2VConfig(),
  )

  final case class Result(model: EmbeddingModel, walkMs: Long, trainMs: Long)

  def train(spark: SparkSession, graph: CompactGraph, cfg: Config): Result = {
    val t0 = System.nanoTime()
    val corpus = Node2VecWalker.corpus(spark, graph, cfg.n2v)
      .persist(org.apache.spark.storage.StorageLevel.MEMORY_AND_DISK)
    corpus.count()
    val t1 = System.nanoTime()
    val model = EmbeddingTrainer.train(corpus, cfg.w2v)
    val t2 = System.nanoTime()
    corpus.unpersist()
    Result(model, (t1 - t0) / 1_000_000L, (t2 - t1) / 1_000_000L)
  }
}
