package repro.integration

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("perfect prediction gives P=R=F=1") {
    val gt = Set((1, 2), (3, 4))
    val prf = Metrics.prf(gt, gt)
    assert(prf.precision == 1.0 && prf.recall == 1.0 && prf.f1 == 1.0)
  }

  test("empty prediction gives zero") {
    val prf = Metrics.prf(Set.empty[(Int, Int)], Set((1, 2)))
    assert(prf.precision == 0.0 && prf.recall == 0.0 && prf.f1 == 0.0)
  }

  test("half right, half missed") {
    val prf = Metrics.prf(Set((1, 2), (9, 9)), Set((1, 2), (3, 4)))
    assert(prf.precision == 0.5 && prf.recall == 0.5 && prf.f1 == 0.5)
  }

  test("precision penalises extra predictions") {
    val prf = Metrics.prf(Set((1, 2), (5, 6)), Set((1, 2)))
    assert(prf.precision == 0.5 && prf.recall == 1.0)
    assert(math.abs(prf.f1 - 2.0 / 3.0) < 1e-9)
  }

  test("f1 is harmonic mean") {
    val prf = PRF(0.8, 0.4)
    assert(math.abs(prf.f1 - 2 * 0.8 * 0.4 / 1.2) < 1e-9)
  }

  test("pairs are directional") {
    val prf = Metrics.prf(Set((2, 1)), Set((1, 2)))
    assert(prf.f1 == 0.0)
  }
}
