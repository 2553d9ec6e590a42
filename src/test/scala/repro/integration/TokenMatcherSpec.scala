package repro.integration

import repro.SparkSpec
import repro.core.EmbeddingModel

class TokenMatcherSpec extends SparkSpec {

  private def v(xs: Double*): Array[Float] = xs.map(_.toFloat).toArray

  test("domain extracts distinct normalized tokens") {
    import spark.implicits._
    val df = Seq((0L, "Denmark"), (1L, "France"), (2L, "denmark"), (3L, null.asInstanceOf[String]))
      .toDF("__rid", "country")
    assert(TokenMatcher.domain(df, "country") == Seq("denmark", "france"))
  }

  test("embedding matcher announces the first in-domain neighbour") {
    val model = EmbeddingModel(Seq(
      "denmark" -> v(1, 0, 0), "dk" -> v(0.97, 0.1, 0),
      "france" -> v(0, 1, 0), "fr" -> v(0.05, 0.97, 0),
    ))
    val got = TokenMatcher.matchByEmbedding(model, Seq("denmark", "france"), Seq("dk", "fr"))
    assert(got.toSet == Set(("denmark", "dk"), ("france", "fr")))
  }

  test("embedding matcher skips tokens missing from the model") {
    val model = EmbeddingModel(Seq("denmark" -> v(1, 0), "dk" -> v(1, 0.1)))
    val got = TokenMatcher.matchByEmbedding(model, Seq("denmark", "unknown"), Seq("dk"))
    assert(got == Seq(("denmark", "dk")))
  }

  test("jaccard matcher pairs string-similar tokens") {
    val got = TokenMatcher.matchByJaccard(
      Seq("photoshop", "illustrator"), Seq("photoshopcs", "illustratorcc", "random"))
    assert(got.toSet == Set(("photoshop", "photoshopcs"), ("illustrator", "illustratorcc")))
  }

  test("jaccard matcher fails on abbreviations with no shared trigrams") {
    val got = TokenMatcher.matchByJaccard(Seq("denmark"), Seq("dk"))
    assert(got.isEmpty) // exactly the failure mode that motivates embeddings
  }

  test("score computes PRF over token pairs") {
    val prf = TokenMatcher.score(
      Seq(("denmark", "dk"), ("france", "it")),
      Seq(("denmark", "dk"), ("france", "fr")))
    assert(prf.precision == 0.5 && prf.recall == 0.5)
  }
}
