package repro.core

import repro.{SparkSpec, TestFixtures}
import repro.data.Scenarios

class EmbDISpec extends SparkSpec {

  private lazy val result = TestFixtures.tinyEmbDI
  private lazy val scenario = TestFixtures.tiny

  test("pipeline learns vectors for tokens, RIDs and CIDs") {
    val m = result.model
    assert(m.size > 100)
    assert(m.words.exists(NodeNames.isRid))
    assert(m.words.exists(NodeNames.isCid))
    assert(m.words.exists(NodeNames.isToken))
  }

  test("all CIDs of both datasets are in the vocabulary") {
    val m = result.model
    scenario.columns1.foreach(c => assert(m.contains(NodeNames.cid(1, c)), s"cid 1/$c"))
    scenario.columns2.foreach(c => assert(m.contains(NodeNames.cid(2, c)), s"cid 2/$c"))
  }

  test("most RIDs are in the vocabulary") {
    val m = result.model
    val nRids = m.words.count(NodeNames.isRid)
    val total = scenario.nRows1 + scenario.nRows2
    assert(nRids >= total * 0.95, s"$nRids of $total RIDs embedded")
  }

  test("timings are populated and positive") {
    val t = result.timings
    assert(t.graphMs >= 0 && t.walkMs > 0 && t.trainMs > 0)
    assert(t.walkPlusTrainMs == t.walkMs + t.trainMs)
    assert(t.totalMs == t.graphMs + t.walkMs + t.trainMs)
  }

  test("sentence count follows the corpus rule") {
    val expectedTokens = RandomWalker.corpusTokensRule(
      result.nDistinctValues, scenario.nRows1 + scenario.nRows2, 300L)
    val expectedWalks = expectedTokens / 20
    // budget allocation rounds down per start node; allow slack
    assert(result.nSentences > expectedWalks / 2 && result.nSentences <= expectedWalks * 2,
      s"${result.nSentences} vs expected ~$expectedWalks")
  }

  test("resolveStrategy fills the Overlap shared set") {
    val st = EmbDI.resolveStrategy(spark, Seq(scenario.d1, scenario.d2),
      Tokenization.Overlap(Set.empty), 4)
    st match {
      case Tokenization.Overlap(s) => assert(s.nonEmpty)
      case other => fail(s"unexpected $other")
    }
  }

  test("resolveStrategy leaves concrete strategies alone") {
    assert(EmbDI.resolveStrategy(spark, Seq(scenario.d1), Tokenization.Simple, 4) ==
      Tokenization.Simple)
  }

  test("duplicate rows end up with similar RID embeddings") {
    val m = result.model
    val pairs = scenario.rowMatches.collect().map(r => (r.getLong(0), r.getLong(1)))
    val matchedCos = pairs.flatMap { case (a, b) =>
      m.cosine(NodeNames.rid(a), NodeNames.rid(b))
    }
    // random rid pairs as background
    val rids = m.words.filter(NodeNames.isRid)
    val rng = new scala.util.Random(3)
    val randomCos = (0 until 200).flatMap { _ =>
      m.cosine(rids(rng.nextInt(rids.length)), rids(rng.nextInt(rids.length)))
    }
    val mAvg = matchedCos.sum / matchedCos.length
    val rAvg = randomCos.sum / randomCos.length
    assert(mAvg > rAvg + 0.15, f"matched avg $mAvg%.3f vs random $rAvg%.3f")
  }

  test("matching columns end up with similar CID embeddings") {
    val m = result.model
    val gtCos = scenario.colMatches.flatMap { case (c1, c2) =>
      m.cosine(NodeNames.cid(1, c1), NodeNames.cid(2, c2))
    }
    val nonGt = for {
      c1 <- scenario.columns1; c2 <- scenario.columns2
      if !scenario.colMatches.contains((c1, c2))
      c <- m.cosine(NodeNames.cid(1, c1), NodeNames.cid(2, c2))
    } yield c
    assert(gtCos.sum / gtCos.size > nonGt.sum / nonGt.size,
      s"gt ${gtCos.sum / gtCos.size} vs non-gt ${nonGt.sum / nonGt.size}")
  }
}
