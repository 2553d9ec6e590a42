package repro

/** Smoke tests for the provided scaffolding: TPC-H-lite generators feed the
  * DuckDB oracle and results agree between Spark and DuckDB.
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem aggregate agrees with DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val got = li.groupBy("l_returnflag")
      .agg(org.apache.spark.sql.functions.count("*").as("n"))
      .select("l_returnflag", "n")
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, count(*) as n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("orders-customer join count agrees with DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val got = o.join(c, o("o_custkey") === c("c_custkey")).selectExpr("count(*) as n")
    Oracle.assertEquivalent(got,
      "SELECT count(*) as n FROM orders JOIN customer ON o_custkey = c_custkey",
      "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val counts = df.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
        .limit(10).collect().map(_.getLong(1)).sum
      counts.toDouble / 20000
    }
    assert(topShare(z) > topShare(u) * 3)
  }
}
