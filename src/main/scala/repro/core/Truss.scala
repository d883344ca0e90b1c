package repro.core

import repro.graph.WGraph
import repro.util.{DisjointSet, IntArrayList, IntQueue}

import scala.collection.mutable

/** Mutable γ-truss peeling engine over the top-`p` prefix of a [[WGraph]].
  *
  * A graph is a γ-truss iff every edge participates in ≥ γ−2 triangles.
  * Edges are indexed in the prefix-store order (for u ascending, each
  * `adjHi(u)` edge), supports are maintained under cascading edge removal,
  * and a vertex leaves the graph when its last edge does — mirroring Alg. 7,
  * where cvs is a sequence of *edges*.
  */
final class TrussPeeler(val g: WGraph, val p: Int, val gamma: Int) {

  /** Edge endpoint arrays: edge e joins eA(e) (smaller rank) and eB(e). */
  val (eA, eB) = {
    val m = g.prefixEdges(p).toInt
    val a = new Array[Int](m)
    val b = new Array[Int](m)
    var i = 0
    var u = 0
    while (u < p) {
      val h = g.adjHi(u)
      var j = 0
      while (j < h.length) { a(i) = h(j); b(i) = u; i += 1; j += 1 }
      u += 1
    }
    (a, b)
  }

  val mEdges: Int = eA.length

  /** Alive adjacency: neighbour rank → edge id. */
  val adj: Array[mutable.HashMap[Int, Int]] = Array.fill(p)(new mutable.HashMap[Int, Int])

  {
    var e = 0
    while (e < mEdges) { adj(eA(e)).update(eB(e), e); adj(eB(e)).update(eA(e), e); e += 1 }
  }

  /** Triangles each alive edge currently participates in. */
  val support: Array[Int] = {
    val s = new Array[Int](mEdges)
    var e = 0
    while (e < mEdges) {
      val (x, y) = (eA(e), eB(e))
      val (small, large) = if (adj(x).size <= adj(y).size) (adj(x), adj(y)) else (adj(y), adj(x))
      var cnt = 0
      small.keysIterator.foreach(z => if (large.contains(z)) cnt += 1)
      s(e) = cnt
      e += 1
    }
    s
  }

  val eAlive: Array[Boolean] = Array.fill(mEdges)(true)
  private val queued = new Array[Boolean](mEdges)
  private val queue = new IntQueue(mEdges)

  /** Alive-edge count per vertex; a vertex is "in the graph" iff > 0. */
  val vDeg: Array[Int] = {
    val d = new Array[Int](p)
    var e = 0
    while (e < mEdges) { d(eA(e)) += 1; d(eB(e)) += 1; e += 1 }
    d
  }

  /** Reduce to the γ-truss (Alg. 7 line 1; removals not recorded). */
  def reduceToTruss(): Unit = {
    var e = 0
    while (e < mEdges) {
      if (support(e) < gamma - 2 && !queued(e)) { queued(e) = true; queue.push(e) }
      e += 1
    }
    drain(null)
  }

  /** Force-remove all remaining edges of vertex `u` with cascade, recording
    * removed edge ids into `cvs` (Alg. 7 lines 7–8).
    */
  def removeVertexEdges(u: Int, cvs: IntArrayList): Unit = {
    val eids = adj(u).values.toArray
    var i = 0
    while (i < eids.length) {
      val e = eids(i)
      if (eAlive(e) && !queued(e)) { queued(e) = true; queue.push(e) }
      i += 1
    }
    drain(cvs)
  }

  private def drain(cvs: IntArrayList): Unit = {
    while (!queue.isEmpty) {
      val e = queue.pop()
      val x = eA(e); val y = eB(e)
      // Decrement the supports of both partner edges of every triangle on e.
      val (small, large) = if (adj(x).size <= adj(y).size) (adj(x), adj(y)) else (adj(y), adj(x))
      small.foreach { case (z, e1) =>
        if (z != x && z != y) large.get(z) match {
          case Some(e2) =>
            dec(e1); dec(e2)
          case None => ()
        }
      }
      adj(x).remove(y)
      adj(y).remove(x)
      eAlive(e) = false
      vDeg(x) -= 1
      vDeg(y) -= 1
      if (cvs != null) cvs.add(e)
    }
  }

  private def dec(e: Int): Unit = {
    if (support(e) == gamma - 2 && !queued(e)) { queued(e) = true; queue.push(e) }
    support(e) -= 1
  }
}

/** Result of CountICC: keynodes plus the community-aware *edge* sequence. */
final case class TrussCvs(keys: Array[Int], keyPos: Array[Int], cvs: Array[Int],
                          eA: Array[Int], eB: Array[Int]) {
  def count: Int = keys.length
  def group(i: Int): Array[Int] = {
    val from = keyPos(i)
    val until = if (i + 1 < keys.length) keyPos(i + 1) else cvs.length
    val out = new Array[Int](until - from)
    System.arraycopy(cvs, from, out, 0, until - from)
    out
  }
}

/** Algorithms 6–7: influential γ-truss community search (§5.2 case study). */
object Truss {

  /** Alg. 7 CountICC: peel the top-`p` prefix, returning keys and edge cvs. */
  def countICC(g: WGraph, p: Int, gamma: Int): TrussCvs = {
    val peeler = new TrussPeeler(g, p, gamma)
    peeler.reduceToTruss()
    val keys = new IntArrayList()
    val keyPos = new IntArrayList()
    val cvs = new IntArrayList()
    var cursor = p - 1
    while (cursor >= 0) {
      while (cursor >= 0 && peeler.vDeg(cursor) == 0) cursor -= 1
      if (cursor >= 0) {
        keyPos.add(cvs.length)
        keys.add(cursor)
        peeler.removeVertexEdges(cursor, cvs)
      }
    }
    TrussCvs(keys.toArray, keyPos.toArray, cvs.toArray, peeler.eA, peeler.eB)
  }

  /** EnumICC: materialise the communities of the last `k` keynodes from the
    * edge cvs, linking sub-communities via a disjoint-set over vertices (the
    * edge groups of nested communities are disjoint; vertex sets are deduped
    * at materialisation).
    */
  def enumICC(g: WGraph, p: Int, res: TrussCvs, k: Int): Seq[Community] = {
    val ds = new DisjointSet(p)
    val groups = new mutable.HashMap[Int, Array[Int]]
    val childKeys = new mutable.HashMap[Int, Array[Int]]
    val from = math.max(0, res.keys.length - k)
    var i = res.keys.length - 1
    while (i >= from) {
      val u = res.keys(i)
      val gp = res.group(i)
      ds.makeRoot(u)
      val ch = new IntArrayList()
      var j = 0
      while (j < gp.length) {
        val e = gp(j)
        var side = 0
        while (side < 2) {
          val z = if (side == 0) res.eA(e) else res.eB(e)
          if (!ds.assigned(z)) ds.assign(z, u)
          else {
            val r = ds.find(z)
            if (r != u) { ch.add(r); ds.unionInto(r, u) }
          }
          side += 1
        }
        j += 1
      }
      groups(u) = gp
      childKeys(u) = ch.toArray
      i -= 1
    }
    // Materialise: edge groups of a community's forest are disjoint.
    val edgeMemo = new mutable.HashMap[Int, Array[Int]]
    def edgesOf(u: Int): Array[Int] = edgeMemo.getOrElseUpdate(u, {
      val parts = childKeys(u).map(edgesOf)
      val total = groups(u).length + parts.map(_.length).sum
      val out = new Array[Int](total)
      System.arraycopy(groups(u), 0, out, 0, groups(u).length)
      var off = groups(u).length
      parts.foreach { part => System.arraycopy(part, 0, out, off, part.length); off += part.length }
      out
    })
    (res.keys.length - 1 to from by -1).map { idx =>
      val u = res.keys(idx)
      val vs = new mutable.HashSet[Int]()
      edgesOf(u).foreach { e => vs += res.eA(e); vs += res.eB(e) }
      val members = vs.toArray.map(g.origId)
      java.util.Arrays.sort(members)
      Community(g.origId(u), g.weights(u), members)
    }
  }

  /** Alg. 6 instantiated for γ-truss: LocalSearch-Truss. */
  def localSearchTopK(g: WGraph, k: Int, gamma: Int,
                      delta: Double = 2.0): (Seq[Community], SearchStats) = {
    var p = math.min(g.n, k + gamma)
    var rounds = 0
    var work = 0L
    var res = Truss.countICC(g, p, gamma)
    rounds += 1
    work += g.prefixSize(p)
    while (res.count < k && p < g.n) {
      val target = math.ceil(delta * g.prefixSize(p).toDouble).toLong
      p = math.min(g.n, math.max(p + 1, g.growTo(target)))
      res = Truss.countICC(g, p, gamma)
      rounds += 1
      work += g.prefixSize(p)
    }
    (enumICC(g, p, res, k), SearchStats(rounds, p, g.prefixSize(p), work))
  }

  /** Eval-VIII's GlobalSearch-Truss: CountICC on the whole graph + EnumICC. */
  def globalSearchTopK(g: WGraph, k: Int, gamma: Int): Seq[Community] = {
    val res = Truss.countICC(g, g.n, gamma)
    enumICC(g, g.n, res, k)
  }
}
