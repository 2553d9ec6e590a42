package repro.baselines

import repro.SparkSpec
import repro.core.{CompactGraph, EmbeddingTrainer, TripartiteGraph, Tokenization}

class HarpSpec extends SparkSpec {

  private lazy val graph: CompactGraph = {
    import spark.implicits._
    val df = (0L until 40L).map(i => (i, s"t${i % 11}", s"u${i % 7}")).toDF("__rid", "a", "b")
    CompactGraph.fromEdges(TripartiteGraph.edges(spark, Seq(df), Tokenization.Simple))
  }

  test("coarsen reduces the node count") {
    val (coarse, _) = Harp.coarsen(graph, 1, 1L)
    assert(coarse.numNodes < graph.numNodes)
    assert(coarse.numNodes >= graph.numNodes / 2)
  }

  test("coarsen mapping covers every fine node") {
    val (coarse, mapping) = Harp.coarsen(graph, 1, 2L)
    assert(mapping.length == graph.numNodes)
    mapping.foreach(c => assert(c >= 0 && c < coarse.numNodes))
  }

  test("coarsen preserves connectivity: fine edges map to coarse edges or merges") {
    val (coarse, mapping) = Harp.coarsen(graph, 1, 3L)
    (0 until graph.numNodes).foreach { u =>
      graph.neighborsOf(u).foreach { v =>
        val cu = mapping(u); val cv = mapping(v)
        assert(cu == cv || coarse.hasEdge(cu, cv),
          s"fine edge ${graph.names(u)}-${graph.names(v)} lost")
      }
    }
  }

  test("coarsen is deterministic in the seed") {
    val (a, ma) = Harp.coarsen(graph, 1, 9L)
    val (b, mb) = Harp.coarsen(graph, 1, 9L)
    assert(a.numNodes == b.numNodes)
    assert(ma.sameElements(mb))
  }

  test("train produces embeddings for fine-level node names") {
    val res = Harp.train(spark, graph,
      Harp.Config(levels = 2, corpusTokens = 60000, walkLength = 10,
        w2v = EmbeddingTrainer.W2VConfig(dim = 16, minCount = 1, numPartitions = 2)))
    // supernode names (h1__/h2__) must not leak into the model vocabulary
    assert(!res.model.words.exists(_.startsWith("h1__")))
    assert(!res.model.words.exists(_.startsWith("h2__")))
    // a decent share of fine nodes embedded
    val embedded = graph.names.count(res.model.contains)
    assert(embedded > graph.numNodes / 2, s"$embedded of ${graph.numNodes}")
    assert(res.walkMs > 0 && res.trainMs > 0)
  }
}
