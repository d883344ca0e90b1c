package repro.core

import repro.graph.WGraph

/** Execution statistics for the analysis of §3.3 and the benches.
  *
  * @param rounds       number of CountIC invocations (h in Lemma 3.7)
  * @param finalPrefix  number of ranks in the last processed prefix
  * @param accessedSize size(G≥τ_h) — the largest subgraph accessed
  * @param workSize     Σ_i size(G≥τ_i) — total peel work
  */
final case class SearchStats(rounds: Int, finalPrefix: Int,
                             accessedSize: Long, workSize: Long)

/** Algorithm 1: the instance-optimal LocalSearch for top-k influential
  * γ-community search.
  *
  * Starts from the heuristic prefix of `k + γ` vertices (a γ-community has ≥
  * γ+1 members, so k communities span ≥ k+γ distinct vertices), counts
  * communities with [[CountIC]], and grows the prefix by the ratio δ (line 4)
  * until it contains ≥ k communities or equals G; the answer is then
  * enumerated from the final prefix with [[CommunityIndex]] (EnumIC).
  */
object LocalSearch {

  /** Top-k influential γ-communities in decreasing influence order. */
  def topK(g: WGraph, k: Int, gamma: Int, delta: Double = 2.0): (Seq[Community], SearchStats) = {
    require(k >= 1, "k must be positive")
    require(delta > 1.0, "growth ratio must exceed 1")
    val (res, p, stats) = searchPrefix(g, k, gamma, delta, nonContainment = false)
    val idx = new CommunityIndex(g)
    val from = math.max(0, res.keys.length - k)
    idx.process(res, p, from)
    val out = (res.keys.length - 1 to from by -1).map(i => idx.community(res.keys(i)))
    (out, stats)
  }

  /** Top-k *non-containment* influential γ-communities (§5.1). The community
    * of an NC keynode u is exactly gp(u), so no EnumIC pass is needed.
    */
  def topKNonContainment(g: WGraph, k: Int, gamma: Int,
                         delta: Double = 2.0): (Seq[Community], SearchStats) = {
    require(k >= 1, "k must be positive")
    val (res, _, stats) = searchPrefix(g, k, gamma, delta, nonContainment = true)
    val ncIdx = res.keys.indices.filter(res.nc(_))
    val out = ncIdx.takeRight(k).reverse.map { i =>
      val members = res.group(i).map(g.origId)
      java.util.Arrays.sort(members)
      Community(g.origId(res.keys(i)), g.weights(res.keys(i)), members)
    }
    (out, stats)
  }

  /** The shared search loop: returns the final CvsResult, prefix, stats. */
  private def searchPrefix(g: WGraph, k: Int, gamma: Int, delta: Double,
                           nonContainment: Boolean): (CvsResult, Int, SearchStats) = {
    var p = math.min(g.n, k + gamma)
    var rounds = 0
    var work = 0L
    var res: CvsResult = null
    var done = false
    while (!done) {
      res = CountIC.run(g, p, gamma, trackNc = nonContainment)
      rounds += 1
      work += g.prefixSize(p)
      val cnt = if (nonContainment) res.ncCount else res.count
      if (cnt >= k || p == g.n) done = true
      else {
        val target = math.ceil(delta * g.prefixSize(p).toDouble).toLong
        p = math.min(g.n, math.max(p + 1, g.growTo(target)))
      }
    }
    (res, p, SearchStats(rounds, p, g.prefixSize(p), work))
  }
}
