package repro.core

import repro.SparkSpec
import repro.Oracle

import scala.util.Random

class TokenizationSpec extends SparkSpec {

  import Tokenization._

  test("normalize trims and lowercases") {
    assert(normalize("  Hello World  ").contains("hello_world"))
  }

  test("normalize collapses internal whitespace") {
    assert(normalize("a  b\t c").contains("a_b_c"))
  }

  test("normalize returns None for null") { assert(normalize(null).isEmpty) }

  test("normalize returns None for empty and blank strings") {
    assert(normalize("").isEmpty)
    assert(normalize("   ").isEmpty)
  }

  test("normalize rounds numeric strings to significant figures") {
    assert(normalize("123456", 4).contains("123500"))
    assert(normalize("3.14159", 3).contains("3.14"))
  }

  test("normalize keeps integers integral") {
    assert(normalize("2012").contains("2012"))
  }

  test("normalize leaves formatted strings categorical") {
    assert(normalize("555-0123").contains("555-0123"))
  }

  test("Simple keeps a multi-word cell as one token") {
    assert(tokens("iPad 4th 2012", Simple) == Seq("ipad_4th_2012"))
  }

  test("Flatten splits a multi-word cell into word tokens") {
    assert(tokens("iPad 4th Gen", Flatten) == Seq("ipad", "4th", "gen"))
  }

  test("Flatten of single word equals Simple") {
    assert(tokens("apple", Flatten) == tokens("apple", Simple))
  }

  test("Overlap keeps shared values whole") {
    val st = Overlap(Set("ipad_4th"))
    assert(tokens("iPad 4th", st) == Seq("ipad_4th"))
  }

  test("Overlap splits non-shared values") {
    val st = Overlap(Set("something_else"))
    assert(tokens("iPad 4th", st) == Seq("ipad", "4th"))
  }

  test("tokens of null cell is empty") {
    assert(tokens(null, Simple).isEmpty)
    assert(tokens(null, Flatten).isEmpty)
  }

  test("numeric cells produce one token under every strategy") {
    Seq(Simple, Flatten, Overlap(Set.empty[String])).foreach { st =>
      assert(tokens("42.5", st) == Seq("42.5"))
    }
  }

  test("normalize is idempotent (property)") {
    val rng = new Random(0)
    (0 until 200).foreach { _ =>
      val s = Random.alphanumeric.take(rng.nextInt(12)).mkString
      normalize(s).foreach { n =>
        assert(normalize(n).contains(n), s"input '$s' normalized '$n'")
      }
    }
  }

  test("Flatten tokens never contain whitespace (property)") {
    val rng = new Random(1)
    (0 until 200).foreach { _ =>
      val ws = Seq.fill(1 + rng.nextInt(4))(
        (0 until 1 + rng.nextInt(6)).map(_ => ('a' + rng.nextInt(26)).toChar).mkString)
      val toks = tokens(ws.mkString(" "), Flatten)
      assert(toks.forall(t => !t.contains(" ")))
      assert(toks.nonEmpty)
    }
  }

  test("sharedValues finds the intersection of two datasets") {
    import spark.implicits._
    val d1 = Seq((0L, "Apple", "iPad 4th"), (1L, "Samsung", "Galaxy"))
      .toDF("__rid", "maker", "product")
    val d2 = Seq((2L, "Apple", "MacBook"), (3L, "Sony", "Bravia"))
      .toDF("__rid", "maker", "product")
    assert(Tokenization.sharedValues(spark, d1, d2) == Set("apple"))
  }

  test("distinctValues matches a DuckDB oracle count") {
    import spark.implicits._
    val d = Seq((0L, "Alpha", "x"), (1L, "beta", "y"), (2L, "ALPHA", "y"))
      .toDF("__rid", "a", "b")
    val got = Tokenization.distinctValues(spark, d)
    // alpha, beta, x, y → lowercased dedup
    Oracle.assertEquivalent(
      got.selectExpr("count(*) as n"),
      "SELECT count(*) as n FROM (SELECT DISTINCT lower(a) FROM " +
        "(SELECT a FROM t UNION ALL SELECT b FROM t))",
      "t" -> d.selectExpr("a", "b"))
  }

  test("distinctValues drops nulls") {
    import spark.implicits._
    val d = Seq((0L, Some("x"), None: Option[String]), (1L, None, Some("y")))
      .toDF("__rid", "a", "b")
    val vals = Tokenization.distinctValues(spark, d).collect().map(_.getString(0)).toSet
    assert(vals == Set("x", "y"))
  }
}
