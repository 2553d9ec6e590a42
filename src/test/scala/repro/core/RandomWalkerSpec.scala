package repro.core

import repro.SparkSpec

import scala.util.Random

class RandomWalkerSpec extends SparkSpec {

  import RandomWalker._

  private lazy val graph: CompactGraph = {
    import spark.implicits._
    val df = Seq(
      (0L, "paul", "ipad"), (1L, "mike", "ipad"), (2L, "steve", "galaxy"),
    ).toDF("__rid", "c1", "c2")
    CompactGraph.fromEdges(TripartiteGraph.edges(spark, Seq(df), Tokenization.Simple))
  }

  test("walkFrom produces a path of the requested length") {
    val rng = new Random(1)
    val w = walkFrom(graph, graph.index("paul"), WalkConfig(walkLength = 10), rng)
    assert(w.length == 10)
  }

  test("walkFrom starting at a token prepends a neighboring RID (Algorithm 2)") {
    val rng = new Random(2)
    val start = graph.index("ipad")
    (0 until 30).foreach { _ =>
      val w = walkFrom(graph, start, WalkConfig(walkLength = 5, firstStepOrCid = false), rng)
      assert(graph.isRid(w(0)), s"first node ${graph.names(w(0))} not a RID")
      assert(w(1) == start)
      assert(graph.hasEdge(w(0), w(1)))
    }
  }

  test("walkFrom from a RID does not prepend") {
    val rng = new Random(3)
    val start = graph.nodeIdsOfType(1).head
    val w = walkFrom(graph, start, WalkConfig(walkLength = 6), rng)
    assert(w(0) == start)
  }

  test("every consecutive pair in a walk is a graph edge") {
    val rng = new Random(4)
    (0 until 50).foreach { _ =>
      val start = rng.nextInt(graph.numNodes)
      val w = walkFrom(graph, start, WalkConfig(walkLength = 20), rng)
      w.sliding(2).foreach { case Array(a, b) =>
        assert(graph.hasEdge(a, b), s"${graph.names(a)} -> ${graph.names(b)}")
      }
    }
  }

  test("walks alternate token and RID/CID nodes (tripartite structure)") {
    val rng = new Random(5)
    val w = walkFrom(graph, graph.index("paul"), WalkConfig(walkLength = 30), rng)
    w.foreach { n =>
      val t = graph.types(n)
      assert(t == 0 || t == 1 || t == 2)
    }
    // no two token nodes adjacent, no two id nodes adjacent
    w.sliding(2).foreach { case Array(a, b) =>
      assert(graph.isToken(a) != graph.isToken(b))
    }
  }

  test("startNodes AllNodes excludes isolated nodes only") {
    assert(startNodes(graph, AllNodes).length == graph.numNodes)
  }

  test("startNodes TokenNodes picks exactly the token nodes") {
    val s = startNodes(graph, TokenNodes)
    assert(s.forall(graph.isToken))
    assert(s.length == graph.nodeIdsOfType(0).length)
  }

  test("startNodes OverlapTokens restricts to the shared set") {
    val s = startNodes(graph, OverlapTokens(Set("ipad", "galaxy")))
    assert(s.map(graph.names).toSet == Set("ipad", "galaxy"))
  }

  test("corpus honours the token budget within one walk length") {
    val cfg = WalkConfig(walkLength = 10, corpusTokens = 2000, seed = 6)
    val sentences = corpus(spark, graph, cfg).collect().map(_.getSeq[String](0))
    val total = sentences.map(_.size).sum
    assert(total >= 2000 * 9 / 10 && total <= 2 * 2000, s"total tokens $total")
  }

  test("every start node gets at least its budget of walks") {
    val cfg = WalkConfig(walkLength = 5, corpusTokens = 5000, seed = 7)
    val sentences = corpus(spark, graph, cfg).collect().map(_.getSeq[String](0))
    val starts = startNodes(graph, cfg.startStrategy)
    val perNode = math.max(1, (5000 / 5) / starts.length)
    // count walks by their start node: for tokens that's position 1 (after
    // the prepended RID), for rid/cid nodes position 0.
    val counts = scala.collection.mutable.Map.empty[String, Int].withDefaultValue(0)
    sentences.foreach { s =>
      val head = if (NodeNames.isRid(s.head) || NodeNames.isCid(s.head)) s.head else s.head
      counts(head) += 1
    }
    assert(sentences.length == starts.length.toLong * perNode)
  }

  test("corpus is deterministic in the seed") {
    val cfg = WalkConfig(walkLength = 8, corpusTokens = 1000, seed = 99)
    val a = corpus(spark, graph, cfg).collect().map(_.getSeq[String](0).mkString(" ")).sorted
    val b = corpus(spark, graph, cfg).collect().map(_.getSeq[String](0).mkString(" ")).sorted
    assert(a.sameElements(b))
  }

  test("different seeds give different corpora") {
    val a = corpus(spark, graph, WalkConfig(walkLength = 8, corpusTokens = 1000, seed = 1))
      .collect().map(_.getSeq[String](0).mkString(" ")).sorted
    val b = corpus(spark, graph, WalkConfig(walkLength = 8, corpusTokens = 1000, seed = 2))
      .collect().map(_.getSeq[String](0).mkString(" ")).sorted
    assert(!a.sameElements(b))
  }

  test("corpus is invariant to the number of partitions") {
    val base = WalkConfig(walkLength = 8, corpusTokens = 1000, seed = 42)
    val a = corpus(spark, graph, base.copy(numPartitions = 2))
      .collect().map(_.getSeq[String](0).mkString(" ")).sorted
    val b = corpus(spark, graph, base.copy(numPartitions = 7))
      .collect().map(_.getSeq[String](0).mkString(" ")).sorted
    assert(a.sameElements(b))
  }

  test("replacement rewrites emissions with probability, never the path") {
    val cfg = WalkConfig(walkLength = 40, corpusTokens = 20000, seed = 13,
      replacements = Map("ipad" -> ("tablet", 1.0)))
    val sentences = corpus(spark, graph, cfg).collect().map(_.getSeq[String](0))
    val tokens = sentences.flatten
    assert(!tokens.contains("ipad"))
    assert(tokens.contains("tablet"))
    // neighbors of the replaced node still appear (path unaffected): the walk
    // still visits rows r0/r1 which are only reachable through 'ipad'.
    assert(tokens.contains(NodeNames.rid(0)) || tokens.contains(NodeNames.rid(1)))
  }

  test("replacement with probability 0 never fires") {
    val cfg = WalkConfig(walkLength = 20, corpusTokens = 5000, seed = 14,
      replacements = Map("ipad" -> ("tablet", 0.0)))
    val tokens = corpus(spark, graph, cfg).collect().flatMap(_.getSeq[String](0))
    assert(!tokens.contains("tablet"))
  }

  test("corpusTokensRule implements the paper formula") {
    assert(corpusTokensRule(100, 50, 1000) == 150000)
  }
}
