package repro.bench

import repro.SparkSpec
import repro.core.Tokenization
import repro.data.Scenarios
import repro.eval.Bench

/** Table 4: Entity Resolution F-measure.
  *
  * Unsupervised: fastText stand-in, EmbDI-S/F/O, Node2Vec, Harp (all via
  * Algorithm 6, n_top = 10). Supervised: DeepER with pre-trained vs EmbDI
  * embeddings at 5 % labels, plus the task-specific (tuned) variants.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: entity resolution across methods") {
    BenchOut.reset("table4")
    val rows = Scenarios.integrationConfigs.map { cfg =>
      val b = Bench.bundle(spark, cfg.shorthand)
      val strat = Tokenization.Overlap(b.shared)
      val unsup = Seq(
        "fastText" -> Bench.erScore(spark, b, b.pretrained).f1,
        "EmbDI-S"  -> Bench.erScore(spark, b, b.embdiS.model).f1,
        "EmbDI-F"  -> Bench.erScore(spark, b, b.embdiF.model).f1,
        "EmbDI-O"  -> Bench.erScore(spark, b, b.embdiO.model).f1,
        "Node2Vec" -> Bench.erScore(spark, b, b.node2vec.model).f1,
        "Harp"     -> Bench.erScore(spark, b, b.harp.model).f1,
      )
      val sup = Seq(
        "DeepERP"  -> Bench.deepEr(spark, b, b.pretrained, Tokenization.Flatten, tuned = false).f1,
        "DeepERL"  -> Bench.deepEr(spark, b, b.embdiO.model, strat, tuned = false).f1,
        "DeepERPt" -> Bench.deepEr(spark, b, b.pretrained, Tokenization.Flatten, tuned = true).f1,
        "DeepERLt" -> Bench.deepEr(spark, b, b.embdiO.model, strat, tuned = true).f1,
      )
      BenchOut.emit("table4",
        f"${cfg.shorthand}%-4s " + (unsup ++ sup).map { case (n, f) => f"$n=$f%.2f" }.mkString(" "))
      (unsup ++ sup).toMap
    }
    def mean(m: String) = rows.map(_(m)).sum / rows.size
    BenchOut.emit("table4",
      Seq("fastText", "EmbDI-S", "EmbDI-F", "EmbDI-O", "Node2Vec", "Harp",
          "DeepERP", "DeepERL", "DeepERPt", "DeepERLt")
        .map(m => f"$m=${mean(m)}%.2f").mkString("MEAN ", " ", ""))
    // Paper shape: local embeddings at least competitive with the
    // pre-trained space (the stand-in has no true-OOV handicap and our
    // corpus is 10× below the paper's rule — see EXPERIMENTS.md), and
    // supervised DeepER not hurt by local embeddings.
    assert(mean("EmbDI-O") >= mean("fastText") - 0.10,
      s"EmbDI-O ${mean("EmbDI-O")} far below fastText ${mean("fastText")}")
    assert(mean("DeepERL") >= mean("DeepERP") - 0.10,
      s"DeepER-L ${mean("DeepERL")} far below DeepER-P ${mean("DeepERP")}")
  }
}
