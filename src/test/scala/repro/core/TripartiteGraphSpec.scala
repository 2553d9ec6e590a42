package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}

/** Algorithm 1 checked against the paper's running example: the two tables
  * of Figure 1, whose graph is drawn in Figure 2.
  */
class TripartiteGraphSpec extends SparkSpec {

  // Figure 1 left: two small customer datasets.
  private lazy val figure1a: DataFrame = {
    import spark.implicits._
    Seq(
      (0L, "Paul", "iPad 4th"),
      (1L, "Mike", "iPad 4th"),
      (2L, "Steve", "Galaxy"),
    ).toDF("__rid", "A1", "A2")
  }
  private lazy val figure1b: DataFrame = {
    import spark.implicits._
    Seq(
      (3L, "Rick", "Samsung"),
      (4L, "Paul", "Apple"),
    ).toDF("__rid", "A3", "A4")
  }

  private def graphFor(strategy: Tokenization.Strategy): CompactGraph =
    CompactGraph.fromEdges(
      TripartiteGraph.edges(spark, Seq(figure1a, figure1b), strategy))

  test("Figure 2 graph has the expected node counts under Simple") {
    val g = graphFor(Tokenization.Simple)
    // tokens: paul, mike, steve, rick, ipad_4th, galaxy, samsung, apple = 8
    assert(g.nodeIdsOfType(0).length == 8)
    assert(g.nodeIdsOfType(1).length == 5) // r0..r4
    assert(g.nodeIdsOfType(2).length == 4) // A1, A2, A3, A4
  }

  test("every cell contributes one token-RID and one token-CID edge, deduplicated") {
    val g = graphFor(Tokenization.Simple)
    // 10 cells → 20 raw edges; 'ipad_4th' occurs in two rows of the same
    // column, so its token-CID edge dedups: 19 undirected edges.
    assert(g.numEdges == 19)
  }

  test("shared token is connected to both its rows") {
    val g = graphFor(Tokenization.Simple)
    val paul = g.index("paul")
    val nbrs = g.neighborsOf(paul).map(g.names).toSet
    assert(nbrs.contains(NodeNames.rid(0)))
    assert(nbrs.contains(NodeNames.rid(4)))
    assert(nbrs.contains(NodeNames.cid(1, "A1")))
    assert(nbrs.contains(NodeNames.cid(2, "A3")))
  }

  test("Flatten splits iPad 4th into two token nodes on the same RID") {
    val g = graphFor(Tokenization.Flatten)
    assert(g.index.contains("ipad"))
    assert(g.index.contains("4th"))
    val r0nbrs = g.neighborsOf(g.index(NodeNames.rid(0))).map(g.names).toSet
    assert(r0nbrs.contains("ipad") && r0nbrs.contains("4th") && r0nbrs.contains("paul"))
  }

  test("RIDs connect only to tokens, never to CIDs") {
    val g = graphFor(Tokenization.Simple)
    g.nodeIdsOfType(1).foreach { r =>
      assert(g.neighborsOf(r).forall(g.isToken), s"rid ${g.names(r)}")
    }
  }

  test("CIDs connect only to tokens") {
    val g = graphFor(Tokenization.Flatten)
    g.nodeIdsOfType(2).foreach { c =>
      assert(g.neighborsOf(c).forall(g.isToken))
    }
  }

  test("null cells are skipped (the §5.2 default)") {
    import spark.implicits._
    val withNull = Seq((0L, Some("a"), None: Option[String]), (1L, Some("b"), Some("c")))
      .toDF("__rid", "x", "y")
    val g = CompactGraph.fromEdges(TripartiteGraph.edges(spark, Seq(withNull), Tokenization.Simple))
    assert(g.nodeIdsOfType(0).map(g.names).toSet == Set("a", "b", "c"))
    // rid 0 has only one token neighbor
    assert(g.degree(g.index(NodeNames.rid(0))) == 1)
  }

  test("edge count matches a DuckDB oracle over the melted relation") {
    val edges = TripartiteGraph.edges(spark, Seq(figure1a), Tokenization.Simple)
    // Melted (rid, col, token) view of the same table, built independently.
    val melted = figure1a
      .selectExpr("__rid as rid", "'A1' as col", "lower(replace(A1, ' ', '_')) as v")
      .union(figure1a.selectExpr("__rid as rid", "'A2' as col", "lower(replace(A2, ' ', '_')) as v"))
      .where("v is not null")
    // #edges = #distinct (token, rid) + #distinct (token, col).
    Oracle.assertEquivalent(
      edges.selectExpr("count(*) as n"),
      "SELECT (SELECT count(*) FROM (SELECT DISTINCT v, rid FROM m)) + " +
        "(SELECT count(*) FROM (SELECT DISTINCT v, col FROM m)) as n",
      "m" -> melted)
  }

  test("nodes DataFrame types partition the node set") {
    val edges = TripartiteGraph.edges(spark, Seq(figure1a, figure1b), Tokenization.Simple)
    val nodes = TripartiteGraph.nodes(spark, edges).collect()
    assert(nodes.map(_.getString(0)).distinct.length == nodes.length)
    assert(nodes.forall(r => Set("token", "rid", "cid").contains(r.getString(1))))
  }

  test("stats aggregates node and edge counts") {
    val edges = TripartiteGraph.edges(spark, Seq(figure1a, figure1b), Tokenization.Simple)
    val s = TripartiteGraph.stats(spark, edges)
    assert(s.nTokens == 8 && s.nRids == 5 && s.nCids == 4)
    assert(s.nEdges == 19)
  }

  test("the graph is orders of magnitude smaller than a complete-subgraph encoding") {
    // §4.1: tripartite ⇒ 2m edges/tuple vs m(m-1)/2 + attribute edges.
    import spark.implicits._
    val wide = (0L until 50L).map { r =>
      (r, s"a$r", s"b$r", s"c$r", s"d$r", s"e$r", s"f$r", s"g$r", s"h$r")
    }.toDF("__rid", "c1", "c2", "c3", "c4", "c5", "c6", "c7", "c8")
    val g = CompactGraph.fromEdges(TripartiteGraph.edges(spark, Seq(wide), Tokenization.Simple))
    assert(g.numEdges == 50 * 8 * 2) // linear in cells, not quadratic in columns
  }
}
