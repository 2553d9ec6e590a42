package repro.core

import org.apache.spark.sql.SparkSession

/** Bulk top-k cosine nearest-neighbour search: the target matrix is
  * broadcast, queries are parallelised with Spark (mapPartitions doing the
  * dot products). All vectors are assumed L2-normalized (as produced by
  * [[EmbeddingModel]]).
  */
object NearestNeighbors {

  /** For each (name, vector) query, the k most-similar targets, descending.
    * A query that is also a target never matches itself. */
  def topK(spark: SparkSession,
           queries: Seq[(String, Array[Float])],
           targets: Seq[(String, Array[Float])],
           k: Int): Map[String, Seq[(String, Double)]] = {
    if (queries.isEmpty || targets.isEmpty) return Map.empty
    val tNames = targets.map(_._1).toArray
    val tVecs  = targets.map(_._2).toArray
    val bt = spark.sparkContext.broadcast((tNames, tVecs))
    val parts = math.min(64, math.max(1, queries.size / 16))
    val result = spark.sparkContext
      .parallelize(queries.toIndexedSeq, parts)
      .map { case (qName, qVec) =>
        val (names, vecs) = bt.value
        // Fixed-size selection without a full sort: small k, large n.
        val heap = new scala.collection.mutable.PriorityQueue[(Double, Int)]()(
          Ordering.by[(Double, Int), Double](-_._1)) // min-heap on score
        var i = 0
        while (i < vecs.length) {
          if (names(i) != qName) {
            val s = EmbeddingModel.dot(qVec, vecs(i))
            if (heap.size < k) heap.enqueue((s, i))
            else if (s > heap.head._1) { heap.dequeue(); heap.enqueue((s, i)) }
          }
          i += 1
        }
        val ranked: Seq[(Double, Int)] = heap.dequeueAll
        qName -> ranked.map { case (s, i) => (names(i), s) }.sortBy(-_._2)
      }
      .collect()
      .toMap
    bt.destroy()
    result
  }
}
