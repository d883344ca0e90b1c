package repro.baseline

import repro.core.Community
import repro.graph.{Peeler, WGraph}
import repro.util.IntArrayList

import scala.collection.mutable

/** The OnlineAll global search baseline [Li et al., PVLDB'15].
  *
  * Iteratively: (1) reduce the current graph to its γ-core, (2) identify the
  * connected component containing the minimum-weight vertex — the next
  * influential γ-community in *increasing* influence order — and (3) remove
  * that vertex. The component traversal in step (2) is the dominant cost
  * (the communities overlap, so Σ|component| can be quadratic); the last k
  * identified communities are the answer. The whole input graph is always
  * traversed, regardless of k.
  */
object OnlineAll {

  /** Top-k communities in decreasing influence order, plus the number of
    * edge visits performed by the component traversals (the work metric).
    */
  def topK(g: WGraph, k: Int, gamma: Int): (Seq[Community], Long) = {
    val n = g.n
    val peeler = new Peeler(g, n, gamma)
    peeler.reduceToCore()

    val lastK = new mutable.ArrayDeque[(Int, Array[Int])](k + 1)
    var visits = 0L
    val mark = new Array[Int](n)
    var curMark = 0
    val stack = new IntArrayList()

    var cursor = n - 1
    while (cursor >= 0) {
      while (cursor >= 0 && !peeler.alive(cursor)) cursor -= 1
      if (cursor >= 0) {
        val u = cursor
        // Step 2: BFS/DFS the component of u over alive vertices.
        curMark += 1
        stack.clear(); stack.add(u); mark(u) = curMark
        var top = 0
        while (top < stack.length) {
          val v = stack(top); top += 1
          g.foreachNeighborIn(v, n) { w =>
            visits += 1
            if (peeler.alive(w) && mark(w) != curMark) { mark(w) = curMark; stack.add(w) }
          }
        }
        lastK.append((u, stack.toArray))
        if (lastK.length > k) lastK.removeHead()
        // Step 3: remove u and restore the γ-core.
        peeler.remove(u, null)
      }
    }

    val out = lastK.toSeq.reverse.map { case (u, ranks) =>
      val members = ranks.map(g.origId)
      java.util.Arrays.sort(members)
      Community(g.origId(u), g.weights(u), members)
    }
    (out, visits)
  }
}
