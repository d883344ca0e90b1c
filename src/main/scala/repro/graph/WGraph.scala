package repro.graph

import scala.collection.mutable

/** Vertex-weighted undirected graph in the paper's *weight-rank* layout.
  *
  * Vertices are identified by their **rank**: position `0` is the
  * highest-weight vertex, `n-1` the lowest (Section 3.1: "vertices are
  * pre-sorted in decreasing order with respect to their weights"). The
  * adjacency of each vertex is pre-partitioned into
  *
  *  - `adjHi(u)` — neighbours with rank `< u` (weight above u's): the paper's
  *    `N≥(u)`, and
  *  - `adjLo(u)` — neighbours with rank `> u`: the paper's `N<(u)`,
  *
  * both sorted ascending by rank. With this layout the prefix subgraph
  * `G≥τ` induced by the top-`p` ranks contains exactly the `adjHi` edges of
  * ranks `0 until p`, so it is retrievable in time linear in its size.
  *
  * Weights may contain ties; all ordering decisions are made by rank (ties
  * broken by ascending original id at build time), matching the paper's
  * distinct-weight assumption.
  */
final class WGraph private[graph] (
    /** Number of vertices. */
    val n: Int,
    /** Weight by rank; non-increasing. */
    val weights: Array[Double],
    /** Original (external) vertex id by rank. */
    val origId: Array[Long],
    /** Higher-weight neighbours (rank < u), ascending. */
    val adjHi: Array[Array[Int]],
    /** Lower-weight neighbours (rank > u), ascending. */
    val adjLo: Array[Array[Int]],
) {

  /** `cumSize(p)` = size (|V|+|E|) of the prefix subgraph on ranks `< p`. */
  val cumSize: Array[Long] = {
    val c = new Array[Long](n + 1)
    var p = 0
    while (p < n) { c(p + 1) = c(p) + 1 + adjHi(p).length; p += 1 }
    c
  }

  /** Total number of undirected edges. */
  def m: Long = cumSize(n) - n

  /** size(G) = |V| + |E|. */
  def size: Long = cumSize(n)

  /** size of the prefix subgraph on the top-`p` ranks. */
  def prefixSize(p: Int): Long = cumSize(p)

  /** Number of edges inside the top-`p` prefix. */
  def prefixEdges(p: Int): Long = cumSize(p) - p

  /** Smallest prefix length whose size is ≥ `target`, capped at n.
    *
    * Implements line 4 of Alg. 1: grow `G≥τ` until `size ≥ δ·size(prev)`;
    * `cumSize` is strictly increasing so binary search applies.
    */
  def growTo(target: Long): Int = {
    var lo = 0
    var hi = n
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (cumSize(mid) >= target) hi = mid else lo = mid + 1
    }
    lo
  }

  /** Degree of rank `u` within the top-`p` prefix (requires `u < p`). */
  def degIn(u: Int, p: Int): Int = adjHi(u).length + countBelow(adjLo(u), p)

  /** Number of entries `< p` in the ascending array `a`. */
  private def countBelow(a: Array[Int], p: Int): Int = {
    var lo = 0
    var hi = a.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (a(mid) < p) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Visit every neighbour of `u` inside the top-`p` prefix. */
  def foreachNeighborIn(u: Int, p: Int)(f: Int => Unit): Unit = {
    val h = adjHi(u)
    var i = 0
    while (i < h.length) { f(h(i)); i += 1 }
    val l = adjLo(u)
    i = 0
    while (i < l.length && l(i) < p) { f(l(i)); i += 1 }
  }

  /** All neighbours of `u` (full graph). */
  def neighbors(u: Int): Iterator[Int] = adjHi(u).iterator ++ adjLo(u).iterator

  /** Map external id → rank (built on demand; used by tests and reporting). */
  lazy val rankOf: Map[Long, Int] =
    origId.iterator.zipWithIndex.map { case (id, r) => id -> r }.toMap
}

object WGraph {

  /** Build from `(id, weight)` pairs and an undirected edge list over external
    * ids. Self-loops are dropped and parallel edges deduplicated; weight ties
    * are broken by ascending id so the rank order is total.
    */
  def apply(weightsById: Seq[(Long, Double)], edges: Iterable[(Long, Long)]): WGraph = {
    val sorted = weightsById.toArray.sortBy { case (id, w) => (-w, id) }
    val n = sorted.length
    val origId = sorted.map(_._1)
    val weights = sorted.map(_._2)
    val rank = new mutable.LongMap[Int](n * 2)
    var r = 0
    while (r < n) { rank(origId(r)) = r; r += 1 }

    val seen = new mutable.HashSet[Long]()
    val pairs = new mutable.ArrayBuffer[(Int, Int)](edges.size)
    for ((a, b) <- edges if a != b) {
      (rank.get(a), rank.get(b)) match {
        case (Some(ra), Some(rb)) =>
          val lo = math.min(ra, rb); val hi = math.max(ra, rb)
          val key = (lo.toLong << 32) | hi.toLong
          if (seen.add(key)) pairs += ((lo, hi))
        case _ =>
          throw new IllegalArgumentException(s"edge ($a,$b) references unknown vertex")
      }
    }
    fromRankedPairs(n, weights, origId, pairs)
  }

  /** Build when ranks and weights are already assigned (e.g. collected from
    * the Spark store, where the window rank is authoritative). `pairs` must be
    * deduplicated canonical `(hiRank?, loRank?)` — any orientation accepted —
    * and reference ranks `< n`.
    */
  def fromRanked(weights: Array[Double], origId: Array[Long],
                 pairs: Iterable[(Int, Int)]): WGraph = {
    val n = weights.length
    val buf = new mutable.ArrayBuffer[(Int, Int)](pairs.size)
    for ((a, b) <- pairs if a != b) {
      buf += ((math.min(a, b), math.max(a, b)))
    }
    fromRankedPairs(n, weights, origId, buf)
  }

  private def fromRankedPairs(n: Int, weights: Array[Double], origId: Array[Long],
                              pairs: mutable.ArrayBuffer[(Int, Int)]): WGraph = {
    val hiCnt = new Array[Int](n) // |adjHi(u)| where u is the larger rank
    val loCnt = new Array[Int](n)
    for ((lo, hi) <- pairs) { hiCnt(hi) += 1; loCnt(lo) += 1 }
    val adjHi = Array.tabulate(n)(u => new Array[Int](hiCnt(u)))
    val adjLo = Array.tabulate(n)(u => new Array[Int](loCnt(u)))
    java.util.Arrays.fill(hiCnt, 0)
    java.util.Arrays.fill(loCnt, 0)
    for ((lo, hi) <- pairs) {
      adjHi(hi)(hiCnt(hi)) = lo; hiCnt(hi) += 1
      adjLo(lo)(loCnt(lo)) = hi; loCnt(lo) += 1
    }
    var u = 0
    while (u < n) {
      java.util.Arrays.sort(adjHi(u))
      java.util.Arrays.sort(adjLo(u))
      u += 1
    }
    new WGraph(n, weights, origId, adjHi, adjLo)
  }
}
