package repro.bench

import repro.SparkSpec
import repro.eval.Bench

/** Table 5: effect of n_top on ER precision / recall / F for the six
  * scenarios the paper reports (AG, BB, DA, IA, IM, WA).
  */
class Table5Bench extends SparkSpec {

  private val scenarios = Seq("AG", "BB", "DA", "IA", "IM", "WA")
  private val nTops = Seq(1, 5, 10, 100)

  test("Table 5: n_top precision/recall trade-off") {
    BenchOut.reset("table5")
    val byScenario = scenarios.map { s =>
      val b = Bench.bundle(spark, s)
      val rows = nTops.map { k =>
        val prf = Bench.erScore(spark, b, b.embdiO.model, nTop = k)
        BenchOut.emit("table5",
          f"$s%-4s ntop=$k%-4d P=${prf.precision}%.3f R=${prf.recall}%.3f F=${prf.f1}%.3f")
        k -> prf
      }.toMap
      s -> rows
    }.toMap
    // expected trade-off: recall does not drop when n_top grows
    scenarios.foreach { s =>
      val r1 = byScenario(s)(1).recall
      val r100 = byScenario(s)(100).recall
      assert(r100 >= r1 - 0.08, s"$s recall fell from $r1 (ntop=1) to $r100 (ntop=100)")
    }
    // precision at n_top=1 is at least precision at n_top=100 on average
    val p1 = scenarios.map(s => byScenario(s)(1).precision).sum / scenarios.size
    val p100 = scenarios.map(s => byScenario(s)(100).precision).sum / scenarios.size
    assert(p1 >= p100 - 0.05, s"mean precision ntop=1 $p1 < ntop=100 $p100")
  }
}
