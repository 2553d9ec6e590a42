package repro.core

import org.apache.spark.sql.DataFrame

import scala.util.Random

/** Immutable CSR adjacency of the tripartite graph, small enough to
  * broadcast to walk-generating executors (the graph is linear in the number
  * of cells; the corpus it generates is 100–1000× larger — that asymmetry is
  * what makes broadcast-and-walk the right distribution strategy, cf.
  * DESIGN.md §2).
  *
  * Node ids are dense ints; `names(i)` / `types(i)` give the node name and
  * kind, `neighbors(offsets(i) until offsets(i+1))` its adjacency (symmetric,
  * sorted, deduplicated).
  */
final class CompactGraph(
    val names: Array[String],
    val types: Array[Byte], // 0 = token, 1 = rid, 2 = cid
    val offsets: Array[Int],
    val neighbors: Array[Int],
) extends Serializable {

  @transient lazy val index: Map[String, Int] = names.zipWithIndex.toMap

  def numNodes: Int = names.length
  def numEdges: Long = neighbors.length.toLong / 2

  def degree(i: Int): Int = offsets(i + 1) - offsets(i)

  def neighborsOf(i: Int): Array[Int] =
    java.util.Arrays.copyOfRange(neighbors, offsets(i), offsets(i + 1))

  def randomNeighbor(i: Int, rng: Random): Int = {
    val d = degree(i)
    require(d > 0, s"node ${names(i)} has no neighbors")
    neighbors(offsets(i) + rng.nextInt(d))
  }

  /** True iff edge (i, j) exists — binary search over the sorted row. */
  def hasEdge(i: Int, j: Int): Boolean = {
    var lo = offsets(i); var hi = offsets(i + 1) - 1
    while (lo <= hi) {
      val mid = (lo + hi) >>> 1
      val v = neighbors(mid)
      if (v == j) return true
      if (v < j) lo = mid + 1 else hi = mid - 1
    }
    false
  }

  def isToken(i: Int): Boolean = types(i) == 0
  def isRid(i: Int): Boolean   = types(i) == 1
  def isCid(i: Int): Boolean   = types(i) == 2

  /** Algorithm 2's `findNeighboringRID`: a uniformly chosen RID neighbor
    * (§5.1 extends this to "a RID **or CID** connected to the token" when
    * maximising bridge impact — `orCid = true`). Falls back to a uniform
    * neighbor if the node has no neighbor of the requested kind. */
  def randomNeighborOfKind(i: Int, rng: Random, orCid: Boolean): Int = {
    val from = offsets(i); val until = offsets(i + 1)
    var count = 0
    var k = from
    while (k < until) {
      val t = types(neighbors(k))
      if (t == 1 || (orCid && t == 2)) count += 1
      k += 1
    }
    if (count == 0) return randomNeighbor(i, rng)
    var pick = rng.nextInt(count)
    k = from
    while (k < until) {
      val t = types(neighbors(k))
      if (t == 1 || (orCid && t == 2)) {
        if (pick == 0) return neighbors(k)
        pick -= 1
      }
      k += 1
    }
    throw new IllegalStateException("unreachable")
  }

  def nodeIdsOfType(t: Byte): Array[Int] =
    Array.range(0, numNodes).filter(types(_) == t)
}

object CompactGraph {

  /** Materialise the CSR from the DataFrame edge list produced by
    * [[TripartiteGraph.edges]] (token→rid / token→cid directed pairs;
    * symmetrized here). */
  def fromEdges(edgeDf: DataFrame): CompactGraph = {
    val pairs = edgeDf.collect().map(r => (r.getString(0), r.getString(1)))
    build(pairs.toIndexedSeq)
  }

  /** Build from an explicit undirected edge list (tests, coarsened graphs). */
  def build(pairs: Seq[(String, String)]): CompactGraph = {
    val nameSet = new scala.collection.mutable.LinkedHashSet[String]
    pairs.foreach { case (a, b) => nameSet += a; nameSet += b }
    val names = nameSet.toArray.sorted // sorted ⇒ deterministic node ids
    val index = names.zipWithIndex.toMap
    val types = names.map { n =>
      if (NodeNames.isRid(n)) 1.toByte else if (NodeNames.isCid(n)) 2.toByte else 0.toByte
    }
    val deg = new Array[Int](names.length)
    val sym = new Array[Long](pairs.length * 2)
    var p = 0
    pairs.foreach { case (a, b) =>
      val ia = index(a); val ib = index(b)
      sym(p) = ia.toLong << 32 | (ib.toLong & 0xffffffffL); p += 1
      sym(p) = ib.toLong << 32 | (ia.toLong & 0xffffffffL); p += 1
    }
    java.util.Arrays.sort(sym)
    // Dedup + degree count.
    var m = 0
    var last = -1L
    var q = 0
    while (q < sym.length) {
      if (sym(q) != last) { last = sym(q); sym(m) = sym(q); deg((sym(q) >>> 32).toInt) += 1; m += 1 }
      q += 1
    }
    val offsets = new Array[Int](names.length + 1)
    var i = 0
    while (i < names.length) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val neigh = new Array[Int](m)
    q = 0
    while (q < m) { neigh(q) = (sym(q) & 0xffffffffL).toInt; q += 1 }
    new CompactGraph(names, types, offsets, neigh)
  }
}
