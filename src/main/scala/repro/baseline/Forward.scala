package repro.baseline

import repro.core.Community
import repro.graph.{Peeler, WGraph}
import repro.util.IntArrayList

/** The Forward global search baseline [Chen et al., CIKM'16].
  *
  * Improves on OnlineAll by performing the expensive connected-component
  * subroutine only for the last k iterations: a first global peel counts the
  * keynodes, a second peel skips the first (count − k) keynodes and computes
  * the component of the minimum-weight vertex for the remaining k. Still a
  * *global* algorithm — both passes traverse the whole graph.
  */
object Forward {

  /** Top-k communities in decreasing influence order. */
  def topK(g: WGraph, k: Int, gamma: Int): Seq[Community] = {
    val total = countKeynodes(g, gamma, nc = false)._1
    secondPass(g, k, gamma, total, nc = false)
  }

  /** §5.1 variant: top-k non-containment communities (Eval-VII's Forward). */
  def topKNonContainment(g: WGraph, k: Int, gamma: Int): Seq[Community] = {
    val totalNc = countKeynodes(g, gamma, nc = true)._2
    secondPassNc(g, k, gamma, totalNc)
  }

  /** Pass 1: peel everything, returning (#keynodes, #NC keynodes). */
  private def countKeynodes(g: WGraph, gamma: Int, nc: Boolean): (Int, Int) = {
    val peeler = new Peeler(g, g.n, gamma)
    peeler.reduceToCore()
    var count = 0
    var ncCount = 0
    val batch = new IntArrayList()
    var cursor = g.n - 1
    while (cursor >= 0) {
      while (cursor >= 0 && !peeler.alive(cursor)) cursor -= 1
      if (cursor >= 0) {
        count += 1
        batch.clear()
        peeler.remove(cursor, batch)
        if (nc && isNcBatch(g, peeler, batch)) ncCount += 1
      }
    }
    (count, ncCount)
  }

  private def isNcBatch(g: WGraph, peeler: Peeler, batch: IntArrayList): Boolean = {
    var isNc = true
    var i = 0
    while (isNc && i < batch.length) {
      g.foreachNeighborIn(batch(i), g.n) { w => if (peeler.alive(w)) isNc = false }
      i += 1
    }
    isNc
  }

  /** Pass 2: skip the first total−k keynodes, then compute components. */
  private def secondPass(g: WGraph, k: Int, gamma: Int, total: Int,
                         nc: Boolean): Seq[Community] = {
    val peeler = new Peeler(g, g.n, gamma)
    peeler.reduceToCore()
    val skip = math.max(0, total - k)
    val out = List.newBuilder[Community]
    val mark = new Array[Int](g.n)
    var curMark = 0
    val stack = new IntArrayList()
    var seen = 0
    var cursor = g.n - 1
    while (cursor >= 0) {
      while (cursor >= 0 && !peeler.alive(cursor)) cursor -= 1
      if (cursor >= 0) {
        val u = cursor
        if (seen >= skip) {
          curMark += 1
          stack.clear(); stack.add(u); mark(u) = curMark
          var top = 0
          while (top < stack.length) {
            val v = stack(top); top += 1
            g.foreachNeighborIn(v, g.n) { w =>
              if (peeler.alive(w) && mark(w) != curMark) { mark(w) = curMark; stack.add(w) }
            }
          }
          val members = stack.toArray.map(g.origId)
          java.util.Arrays.sort(members)
          out += Community(g.origId(u), g.weights(u), members)
        }
        seen += 1
        peeler.remove(u, null)
      }
    }
    out.result().reverse
  }

  private def secondPassNc(g: WGraph, k: Int, gamma: Int, totalNc: Int): Seq[Community] = {
    val peeler = new Peeler(g, g.n, gamma)
    peeler.reduceToCore()
    val skip = math.max(0, totalNc - k)
    var seenNc = 0
    val out = List.newBuilder[Community]
    val batch = new IntArrayList()
    var cursor = g.n - 1
    while (cursor >= 0) {
      while (cursor >= 0 && !peeler.alive(cursor)) cursor -= 1
      if (cursor >= 0) {
        val u = cursor
        batch.clear()
        peeler.remove(u, batch)
        if (isNcBatch(g, peeler, batch)) {
          if (seenNc >= skip) {
            val members = batch.toArray.map(g.origId)
            java.util.Arrays.sort(members)
            out += Community(g.origId(u), g.weights(u), members)
          }
          seenNc += 1
        }
      }
    }
    out.result().reverse
  }
}
