package repro.integration

/** Precision / recall / F-measure against hand-made ground truth (§7). */
final case class PRF(precision: Double, recall: Double) {
  def f1: Double =
    if (precision + recall == 0) 0.0 else 2 * precision * recall / (precision + recall)
  override def toString: String = f"P=$precision%.3f R=$recall%.3f F=$f1%.3f"
}

object Metrics {

  /** Score a set of predicted pairs against ground-truth pairs. Pairs are
    * directional (d1 element, d2 element) in both sets. */
  def prf[A, B](predicted: Set[(A, B)], groundTruth: Set[(A, B)]): PRF = {
    if (predicted.isEmpty) return PRF(0.0, 0.0)
    if (groundTruth.isEmpty) return PRF(0.0, 0.0)
    val tp = predicted.intersect(groundTruth).size.toDouble
    PRF(tp / predicted.size, tp / groundTruth.size)
  }
}
