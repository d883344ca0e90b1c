package repro.baseline

import repro.core.{Community, CommunityIndex, CountIC, SearchStats}
import repro.graph.WGraph

/** The Backward local search baseline [Chen et al., CIKM'16].
  *
  * Grows the weight prefix *one vertex at a time*, re-running the counting
  * peel from scratch on every prefix until k communities exist — so its total
  * work is Σ_p size(prefix_p) = O(size(accessed)²), the quadratic behaviour
  * the paper attributes to Backward (it is outperformed by Forward once γ is
  * large and the accessed prefix grows).
  */
object Backward {

  /** Top-k communities in decreasing influence order, with work stats. */
  def topK(g: WGraph, k: Int, gamma: Int): (Seq[Community], SearchStats) = {
    var p = math.min(g.n, k + gamma)
    var rounds = 0
    var work = 0L
    var res = CountIC.run(g, p, gamma)
    rounds += 1
    work += g.prefixSize(p)
    while (res.count < k && p < g.n) {
      p += 1 // vertex-at-a-time growth: the quadratic-cost signature
      res = CountIC.run(g, p, gamma)
      rounds += 1
      work += g.prefixSize(p)
    }
    val idx = new CommunityIndex(g)
    val from = math.max(0, res.keys.length - k)
    idx.process(res, p, from)
    val out = (res.keys.length - 1 to from by -1).map(i => idx.community(res.keys(i)))
    (out, SearchStats(rounds, p, g.prefixSize(p), work))
  }
}
