package repro.spark

import repro.core.{Community, CommunityIndex, CountIC, SearchStats}

/** Distributed LocalSearch: the paper's Alg. 1 with Spark as the graph
  * substrate (the "iterative local expansion" architecture of DESIGN.md §2).
  *
  * The driver never materialises more than the current prefix: each round
  * pulls the top-p ranks and their `maxRank < p` edges out of the
  * [[SparkGraphStore]] via Catalyst filters, runs the linear-time CountIC
  * peel locally, and doubles the prefix size until k communities exist. The
  * δ-growth step is answered from the driver-resident per-rank histogram
  * (constant per-vertex memory, per the semi-external model) without a
  * cluster round-trip.
  */
object DistLocalSearch {

  /** Top-k influential γ-communities in decreasing influence order. */
  def topK(store: SparkGraphStore, k: Int, gamma: Int,
           delta: Double = 2.0): (Seq[Community], SearchStats) = {
    require(k >= 1, "k must be positive")
    var p = math.min(store.n, k + gamma)
    var rounds = 0
    var work = 0L
    var done = false
    var prefix: repro.graph.WGraph = null
    var res: repro.core.CvsResult = null
    while (!done) {
      prefix = store.collectPrefix(p)
      res = CountIC.run(prefix, p, gamma)
      rounds += 1
      work += store.prefixSize(p)
      if (res.count >= k || p == store.n) done = true
      else {
        val target = math.ceil(delta * store.prefixSize(p).toDouble).toLong
        p = math.min(store.n, math.max(p + 1, store.growTo(target)))
      }
    }
    val idx = new CommunityIndex(prefix)
    val from = math.max(0, res.keys.length - k)
    idx.process(res, p, from)
    val out = (res.keys.length - 1 to from by -1).map(i => idx.community(res.keys(i)))
    (out, SearchStats(rounds, p, store.prefixSize(p), work))
  }
}
