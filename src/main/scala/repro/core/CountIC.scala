package repro.core

import repro.graph.{Peeler, WGraph}
import repro.util.IntArrayList

/** Output of CountIC / ConstructCVS over one prefix.
  *
  * @param keys   keynode ranks in removal order, i.e. **increasing weight**
  *               (keys(0) is the lowest-weight keynode of the prefix)
  * @param keyPos position of `keys(i)` in `cvs`; group `gp(keys(i))` is
  *               `cvs[keyPos(i) until keyPos(i+1))` (to the end for the last)
  * @param cvs    community-aware vertex sequence: every vertex removed by a
  *               `Remove` call, in removal order (core-reduction removals are
  *               excluded, per Alg. 2)
  * @param nc     non-containment flag per key (§5.1); empty unless requested
  */
final case class CvsResult(
    keys: Array[Int],
    keyPos: Array[Int],
    cvs: Array[Int],
    nc: Array[Boolean],
) {
  /** Number of influential γ-communities found (Lemma 3.4: = #keynodes). */
  def count: Int = keys.length

  /** Number of non-containment communities found. */
  def ncCount: Int = nc.count(identity)

  /** Group of the i-th key: `gp(keys(i))`. */
  def group(i: Int): Array[Int] = {
    val from = keyPos(i)
    val until = if (i + 1 < keys.length) keyPos(i + 1) else cvs.length
    val out = new Array[Int](until - from)
    System.arraycopy(cvs, from, out, 0, until - from)
    out
  }
}

/** Algorithm 2 (CountIC) and its progressive variant Algorithm 5
  * (ConstructCVS), plus the §5.1 non-containment keynode flagging.
  *
  * The peel reduces the prefix to its γ-core, then repeatedly takes the
  * minimum-weight (= maximum-rank) alive vertex as the next keynode and
  * removes it with cascading core maintenance. The "find minimum weight"
  * step is a monotone cursor over ranks, so the whole run is
  * O(size(prefix)).
  */
object CountIC {

  /** Peel the top-`p` prefix of `g`.
    *
    * @param stopBeforeRank progressive stop threshold (Alg. 5): stop as soon
    *                       as the next minimum-weight alive vertex has rank
    *                       `< stopBeforeRank`, i.e. weight ≥ τ_{i−1}. Pass 0
    *                       for a full peel (Alg. 2).
    * @param trackNc        also flag non-containment keynodes: a keynode u is
    *                       NC iff no vertex removed during `Remove(u)` has an
    *                       alive neighbour afterwards (§5.1).
    */
  def run(g: WGraph, p: Int, gamma: Int,
          stopBeforeRank: Int = 0, trackNc: Boolean = false): CvsResult = {
    val peeler = new Peeler(g, p, gamma)
    peeler.reduceToCore()

    val keys = new IntArrayList()
    val keyPos = new IntArrayList()
    val cvs = new IntArrayList()
    val ncFlags = new IntArrayList() // 0/1; converted at the end

    var cursor = p - 1
    var done = false
    while (!done) {
      while (cursor >= 0 && !peeler.alive(cursor)) cursor -= 1
      if (cursor < 0 || cursor < stopBeforeRank) done = true
      else {
        val u = cursor
        keyPos.add(cvs.length)
        keys.add(u)
        val before = cvs.length
        peeler.remove(u, cvs)
        if (trackNc) {
          // NC check: the removed batch must have no surviving neighbour.
          var isNc = true
          var i = before
          while (isNc && i < cvs.length) {
            g.foreachNeighborIn(cvs(i), p) { w => if (peeler.alive(w)) isNc = false }
            i += 1
          }
          ncFlags.add(if (isNc) 1 else 0)
        }
      }
    }
    CvsResult(keys.toArray, keyPos.toArray, cvs.toArray,
              ncFlags.toArray.map(_ == 1))
  }
}
