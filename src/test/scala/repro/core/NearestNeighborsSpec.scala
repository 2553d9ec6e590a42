package repro.core

import repro.SparkSpec

import scala.util.Random

class NearestNeighborsSpec extends SparkSpec {

  private def randomVecs(n: Int, dim: Int, seed: Long, prefix: String = "w")
      : Seq[(String, Array[Float])] = {
    val rng = new Random(seed)
    (0 until n).map { i =>
      s"$prefix$i" -> EmbeddingModel.normalize(Array.fill(dim)(rng.nextGaussian().toFloat))
    }
  }

  test("topK matches brute force") {
    // disjoint name spaces: same-name exclusion is tested separately
    val qs = randomVecs(20, 16, 1, "q")
    val ts = randomVecs(50, 16, 2, "t")
    val got = NearestNeighbors.topK(spark, qs, ts, 5)
    qs.foreach { case (q, qv) =>
      val brute = ts.map { case (t, tv) => t -> EmbeddingModel.dot(qv, tv) }
        .sortBy(-_._2).take(5).map(_._1)
      assert(got(q).map(_._1) == brute, s"query $q")
    }
  }

  test("topK scores are descending") {
    val got = NearestNeighbors.topK(spark, randomVecs(10, 8, 3), randomVecs(30, 8, 4), 7)
    got.values.foreach { ns =>
      ns.sliding(2).foreach {
        case Seq((_, a), (_, b)) => assert(a >= b)
        case _ =>
      }
    }
  }

  test("a query never matches itself") {
    val vs = randomVecs(10, 8, 5)
    val got = NearestNeighbors.topK(spark, vs, vs, 3)
    got.foreach { case (q, ns) => assert(!ns.map(_._1).contains(q)) }
  }

  test("k larger than target count returns all targets") {
    val got = NearestNeighbors.topK(spark, randomVecs(3, 4, 6, "q"), randomVecs(4, 4, 7, "t"), 100)
    got.values.foreach(ns => assert(ns.size == 4))
  }

  test("empty inputs yield empty results") {
    assert(NearestNeighbors.topK(spark, Seq.empty, randomVecs(3, 4, 8), 2).isEmpty)
    assert(NearestNeighbors.topK(spark, randomVecs(3, 4, 9), Seq.empty, 2).isEmpty)
  }
}
