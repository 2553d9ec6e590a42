package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{CompactGraph, EmbeddingModel, EmbeddingTrainer, RandomWalker}

import scala.util.Random

/** The HARP baseline of §7 (Chen et al., AAAI'18), rebuilt as a
  * multi-granularity walk corpus (DESIGN.md §3).
  *
  * HARP coarsens the graph into a hierarchy (edge collapsing), learns
  * embeddings at the coarsest level, and warm-starts each finer level from
  * its parent. MLlib's Word2Vec cannot be warm-started, so we keep the
  * hierarchy but substitute the transfer mechanism: walks are generated at
  * *every* level, supernodes are expanded to uniformly-drawn members at
  * emission, and a single Word2Vec trains over the combined corpus — fine
  * nodes still receive the higher-order structural context of their
  * supernode neighborhoods, which is the property HARP adds over plain
  * walks.
  */
object Harp {

  final case class Config(
      levels: Int = 2,
      corpusTokens: Long = 1_000_000L,
      walkLength: Int = 60,
      w2v: EmbeddingTrainer.W2VConfig = EmbeddingTrainer.W2VConfig(),
      seed: Long = 5555L,
      numPartitions: Int = 16,
  )

  /** One coarsening step by randomized maximal edge matching.
    * Returns (coarse graph, fine-node-id → coarse-node-id). Coarse node
    * names are `h<level>__<representative>` so levels never collide. */
  private[baselines] def coarsen(g: CompactGraph, level: Int, seed: Long): (CompactGraph, Array[Int]) = {
    val rng = new Random(seed)
    val match_ = Array.fill(g.numNodes)(-1)
    // Visit nodes in random order; match each unmatched node to a random
    // unmatched neighbor (edge collapsing).
    val order = rng.shuffle((0 until g.numNodes).toVector)
    order.foreach { u =>
      if (match_(u) < 0 && g.degree(u) > 0) {
        val nbrs = g.neighborsOf(u).filter(match_(_) < 0)
        if (nbrs.nonEmpty) {
          val v = nbrs(rng.nextInt(nbrs.length))
          match_(u) = u; match_(v) = u // u is the representative
        }
      }
    }
    (0 until g.numNodes).foreach(u => if (match_(u) < 0) match_(u) = u)
    val repName = (u: Int) => s"h${level}__${g.names(match_(u))}"
    val coarseEdges = (0 until g.numNodes).flatMap { u =>
      g.neighborsOf(u).map(v => (repName(u), repName(v)))
    }.filter { case (a, b) => a != b }
    val coarse = CompactGraph.build(coarseEdges)
    val mapping = Array.tabulate(g.numNodes)(u => coarse.index(repName(u)))
    (coarse, mapping)
  }

  final case class Result(model: EmbeddingModel, walkMs: Long, trainMs: Long)

  /** Train HARP embeddings over the finest graph `g0`. */
  def train(spark: SparkSession, g0: CompactGraph, cfg: Config): Result = {
    import spark.implicits._
    val t0 = System.nanoTime()

    // Build the hierarchy with member lists per coarse node (fine names).
    var graphs = List((g0, Array.tabulate(g0.numNodes)(identity))) // (graph, fine->level mapping)
    var fineToLevel = Array.tabulate(g0.numNodes)(identity)
    var cur = g0
    (1 to cfg.levels).foreach { lvl =>
      val (coarse, m) = coarsen(cur, lvl, cfg.seed + lvl)
      fineToLevel = Array.tabulate(g0.numNodes)(u => m(fineToLevel(u)))
      graphs = graphs :+ ((coarse, fineToLevel.clone()))
      cur = coarse
    }

    // Per level: member lists (fine node names per level-node id).
    val corpora: Seq[DataFrame] = graphs.zipWithIndex.map { case ((g, fineMap), lvlIdx) =>
      val members: Array[Array[String]] = {
        val acc = Array.fill(g.numNodes)(List.empty[String])
        (0 until g0.numNodes).foreach { u => acc(fineMap(u)) ::= g0.names(u) }
        acc.map(_.toArray)
      }
      val budget = cfg.corpusTokens / graphs.size
      val bg = spark.sparkContext.broadcast((g, members))
      val starts = (0 until g.numNodes).filter(g.degree(_) > 0).toIndexedSeq
      val totalWalks = math.max(starts.size.toLong, budget / cfg.walkLength)
      val perNode = math.max(1L, totalWalks / starts.size).toInt
      spark.sparkContext.parallelize(starts, cfg.numPartitions).flatMap { s =>
        val (graph, mem) = bg.value
        (0 until perNode).iterator.map { w =>
          val rng = repro.core.Rand.of(cfg.seed, lvlIdx.toLong * 1_000_003L + s, w.toLong)
          val walk = RandomWalker.walkFrom(graph, s,
            RandomWalker.WalkConfig(walkLength = cfg.walkLength, firstStepRid = false), rng)
          walk.map { id =>
            val m = mem(id)
            if (m.isEmpty) graph.names(id) else m(rng.nextInt(m.length))
          }
        }
      }.toDF("sentence")
    }

    val corpus = corpora.reduce(_ union _)
      .persist(org.apache.spark.storage.StorageLevel.MEMORY_AND_DISK)
    corpus.count()
    val t1 = System.nanoTime()
    val model = EmbeddingTrainer.train(corpus, cfg.w2v)
    val t2 = System.nanoTime()
    corpus.unpersist()
    Result(model, (t1 - t0) / 1_000_000L, (t2 - t1) / 1_000_000L)
  }
}
