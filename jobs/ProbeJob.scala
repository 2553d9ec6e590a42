package repro.jobs

import repro.eval.Bench

/** Quick calibration probe: unsupervised ER, EmbDI-O vs the pre-trained
  * stand-in, on a few scenarios at the current BENCH_CORPUS_FACTOR.
  */
object ProbeJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("probe")
    val scenarios = if (args.nonEmpty) args.toSeq else Seq("FZ", "DA", "BB")
    scenarios.foreach { s =>
      val b = Bench.bundle(spark, s)
      val pre = Bench.erScore(spark, b, b.pretrained)
      val emb = Bench.erScore(spark, b, b.embdiO.model)
      val nRids = b.embdiO.model.words.count(repro.core.NodeNames.isRid)
      val total = b.scenario.nRows1 + b.scenario.nRows2
      println(f"PROBE $s factor=${Bench.params.corpusFactor} " +
        f"fastText=[$pre] EmbDI-O=[$emb] ridsModeled=$nRids/$total")
    }
    spark.stop()
  }
}
