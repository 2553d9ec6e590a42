package repro.bench

import repro.SparkSpec
import repro.data.Scenarios
import repro.eval.Bench

/** Table 6: execution times for embedding generation — EmbDI's G / W / E
  * breakdown plus Node2Vec and HARP walk+train times on the same graph and
  * corpus budget.
  */
class Table6Bench extends SparkSpec {

  test("Table 6: execution time breakdown") {
    BenchOut.reset("table6")
    val rows = Scenarios.allConfigs.map { cfg =>
      val row = Bench.timingRow(spark, cfg.shorthand)
      BenchOut.emit("table6", row.render)
      row
    }
    rows.foreach { r =>
      assert(r.graphMs >= 0 && r.walkMs > 0 && r.trainMs > 0)
    }
    // paper shape: graph construction is a small fraction of total time and
    // embedding training dominates walks.
    val totG = rows.map(_.graphMs).sum.toDouble
    val totW = rows.map(_.walkMs).sum.toDouble
    val totE = rows.map(_.trainMs).sum.toDouble
    BenchOut.emit("table6",
      f"SHARE G=${totG / (totG + totW + totE) * 100}%.1f%% " +
      f"W=${totW / (totG + totW + totE) * 100}%.1f%% " +
      f"E=${totE / (totG + totW + totE) * 100}%.1f%%")
    assert(totG < (totG + totW + totE) * 0.5, "graph construction unexpectedly dominant")
  }
}
