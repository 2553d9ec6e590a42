package repro.baselines

import repro.{SparkSpec, TestFixtures}
import repro.core.Tokenization

class DeepERSpec extends SparkSpec {

  private lazy val sc = TestFixtures.tiny
  private lazy val gt: Set[(Long, Long)] =
    sc.rowMatches.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  // The paper's 5 % label budget is defined on datasets with 10³–10⁴ ground
  // truth matches; on the 40-match tiny scenario that is 2 positives and the
  // classifier fit is pure variance. Unit tests assert quality at 25 %
  // (10 positives) and keep a 5 % smoke run; the bench uses 5 % on the
  // full-size scenarios as in Table 4.
  private def runL(fraction: Double, tuned: Boolean = false) =
    DeepER.run(spark, sc.d1, sc.d2, sc.colMatches,
      TestFixtures.tinyEmbDI.model, Tokenization.Overlap(TestFixtures.tinyShared), gt,
      DeepER.Config(labelFraction = fraction, tuned = tuned))

  test("DeepER with EmbDI embeddings finds duplicates (25% labels)") {
    val prf = runL(0.25)
    assert(prf.f1 > 0.3, s"DeepER-L F=${prf.f1}")
  }

  test("DeepER runs at the paper's 5% label budget") {
    val prf = runL(0.05)
    assert(prf.precision >= 0.0 && prf.recall >= 0.0 && prf.f1 <= 1.0)
  }

  test("DeepER with pre-trained embeddings runs end to end") {
    val pre = PretrainedEmbeddings.forDatasets(Seq(sc.d1, sc.d2), Tokenization.Flatten)
    val prf = DeepER.run(spark, sc.d1, sc.d2, sc.colMatches, pre,
      Tokenization.Flatten, gt, DeepER.Config(labelFraction = 0.25))
    assert(prf.precision >= 0.0 && prf.recall >= 0.0)
  }

  test("tuned variant expands the feature space and still works") {
    val prf = runL(0.25, tuned = true)
    assert(prf.f1 > 0.25, s"tuned DeepER-L F=${prf.f1}")
  }
}
