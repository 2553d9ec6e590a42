package repro.core

import repro.{Oracle, SparkSpec}

class NullHandlingSpec extends SparkSpec {

  import spark.implicits._

  test("skolemizeUnique replaces each NULL with a distinct placeholder") {
    val df = Seq(
      (0L, Some("a"), None: Option[String]),
      (1L, None: Option[String], None: Option[String]),
    ).toDF("__rid", "x", "y")
    val out = NullHandling.skolemizeUnique(df, Seq("x", "y")).collect()
    val values = out.flatMap(r => Seq(r.getString(1), r.getString(2)))
    assert(values.forall(_ != null))
    val placeholders = values.filter(_.startsWith("null__"))
    assert(placeholders.length == 3)
    assert(placeholders.distinct.length == 3)
  }

  test("skolemizeUnique leaves non-null values untouched") {
    val df = Seq((0L, Some("keep"))).toDF("__rid", "x")
    val out = NullHandling.skolemizeUnique(df, Seq("x")).collect()
    assert(out.head.getString(1) == "keep")
  }

  test("enforceFd merges conflicting rhs values into one skolem (§5.2 example)") {
    // R1(a, b, c, N2) and R2(a, b, c', N3): A1,A2 → A3 forces c and c' to merge.
    val df = Seq(
      (0L, "a", "b", Some("c")),
      (1L, "a", "b", Some("c_prime")),
    ).toDF("__rid", "a1", "a2", "a3")
    val out = NullHandling.enforceFd(df, Seq("a1", "a2"), "a3").collect()
    val vals = out.map(_.getString(3)).distinct
    assert(vals.length == 1)
    assert(vals.head.startsWith("sk__"))
  }

  test("enforceFd merges a null into the group skolem") {
    val df = Seq(
      (0L, "k", Some("v")),
      (1L, "k", None: Option[String]),
    ).toDF("__rid", "lhs", "rhs")
    val out = NullHandling.enforceFd(df, Seq("lhs"), "rhs").collect()
    val vals = out.map(_.getString(2)).distinct
    assert(vals.length == 1 && vals.head.startsWith("sk__"))
  }

  test("enforceFd leaves consistent groups untouched") {
    val df = Seq(
      (0L, "k1", Some("v1")),
      (1L, "k1", Some("v1")),
      (2L, "k2", Some("v2")),
    ).toDF("__rid", "lhs", "rhs")
    val out = NullHandling.enforceFd(df, Seq("lhs"), "rhs").collect()
    assert(out.map(_.getString(2)).toSet == Set("v1", "v2"))
  }

  test("enforceFd ignores groups with null lhs") {
    val df = Seq(
      (0L, None: Option[String], Some("v1")),
      (1L, None: Option[String], None: Option[String]),
    ).toDF("__rid", "lhs", "rhs")
    val out = NullHandling.enforceFd(df, Seq("lhs"), "rhs").collect()
    assert(out.map(r => Option(r.getString(2))).toSet == Set(Some("v1"), None))
  }

  test("enforceFd gives different groups different skolems") {
    val df = Seq(
      (0L, "g1", Some("x")), (1L, "g1", Some("y")),
      (2L, "g2", Some("p")), (3L, "g2", Some("q")),
    ).toDF("__rid", "lhs", "rhs")
    val out = NullHandling.enforceFd(df, Seq("lhs"), "rhs").collect()
    val byGroup = out.groupBy(_.getString(1)).view.mapValues(_.map(_.getString(2)).distinct).toMap
    assert(byGroup("g1").length == 1 && byGroup("g2").length == 1)
    assert(byGroup("g1").head != byGroup("g2").head)
  }

  test("enforceFd preserves row count (DuckDB oracle)") {
    val df = Seq(
      (0L, "a", Some("c")), (1L, "a", Some("d")), (2L, "b", None: Option[String]),
    ).toDF("__rid", "lhs", "rhs")
    val out = NullHandling.enforceFd(df, Seq("lhs"), "rhs")
    Oracle.assertEquivalent(
      out.selectExpr("count(*) as n"),
      "SELECT count(*) as n FROM t",
      "t" -> df)
  }
}
