package repro.eval

import repro.{SparkSpec, TestFixtures}
import repro.core.{EmbeddingModel, Tokenization}

class QualityTestsSpec extends SparkSpec {

  private lazy val tok1 = QualityTests.tokenize(TestFixtures.tiny.d1, Tokenization.Flatten)
  private lazy val tok2 = QualityTests.tokenize(TestFixtures.tiny.d2, Tokenization.Flatten)
  private lazy val data = Seq(tok1, tok2)

  test("tokenize builds per-column domains") {
    assert(tok1.columnDomains.keySet == TestFixtures.tiny.columns1.toSet)
    assert(tok1.columnDomains.values.forall(_.nonEmpty))
  }

  test("tokenize builds per-row token lists") {
    assert(tok1.rowTokens.size == TestFixtures.tiny.nRows1)
    assert(tok1.rowTokens.forall(_.forall(_.nonEmpty)))
  }

  test("MA tests: intruder comes from a different attribute domain") {
    val tests = QualityTests.matchAttribute(data, 50, 1L)
    assert(tests.size == 50)
    tests.foreach { t =>
      assert(t.kind == "MA")
      assert(t.tokens.size == 4)
      assert(t.tokens.distinct.size == 4)
      assert(!t.tokens.contains(t.intruder))
    }
  }

  test("MR tests: intruder not among the row's tokens") {
    val tests = QualityTests.matchRow(data, 50, 2L)
    assert(tests.size == 50)
    tests.foreach { t =>
      assert(t.kind == "MR")
      assert(!t.tokens.contains(t.intruder))
      assert(t.tokens.nonEmpty)
    }
  }

  test("MC tests: three in-group tokens plus one out-of-group") {
    val tests = QualityTests.matchConcept(data,
      oneCols = Set("manufacturer", "brand"), manyCols = Set("title", "name"),
      Tokenization.Flatten, 30, 3L)
    assert(tests.nonEmpty)
    tests.foreach { t =>
      assert(t.kind == "MC")
      assert(t.tokens.size == 3)
      assert(!t.tokens.contains(t.intruder))
    }
  }

  test("test generation is deterministic in the seed") {
    val a = QualityTests.matchAttribute(data, 20, 7L)
    val b = QualityTests.matchAttribute(data, 20, 7L)
    assert(a == b)
  }

  test("an oracle model passes every test it can represent") {
    val tests = QualityTests.matchAttribute(data, 20, 4L)
    // oracle: intruders get an orthogonal direction. A token can be a member
    // in one test and the intruder of another; only tests with disjoint
    // roles are representable by a single vector per token.
    val intruders = tests.map(_.intruder).toSet
    val clean = tests.filter(t => t.tokens.forall(!intruders(_)))
    assert(clean.nonEmpty)
    val vocab = clean.flatMap(t => t.tokens :+ t.intruder).distinct
    val good = EmbeddingModel(vocab.map { w =>
      if (intruders(w)) w -> Array(0f, 1f, sketch(w)) else w -> Array(1f, 0f, sketch(w) * 0.01f)
    })
    assert(QualityTests.evaluate(good, clean) > 0.9)
  }

  test("evaluate counts unknown intruders as failures") {
    val tests = Seq(QualityTests.QTest("MA", Seq("a", "b", "c", "d"), "zzz"))
    val m = EmbeddingModel(Seq("a" -> Array(1f, 0f), "b" -> Array(1f, 0.1f),
      "c" -> Array(1f, -0.1f), "d" -> Array(0.9f, 0f)))
    assert(QualityTests.evaluate(m, tests) == 0.0)
  }

  test("evaluate of empty test set is zero") {
    val m = EmbeddingModel(Seq("a" -> Array(1f)))
    assert(QualityTests.evaluate(m, Seq.empty) == 0.0)
  }

  private def sketch(w: String): Float = (w.hashCode % 97) / 970f
}
