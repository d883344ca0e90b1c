package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.gen.GraphGen

class WGraphSpec extends AnyFunSuite {

  private val g = Fixtures.paperLike

  test("ranks are ordered by decreasing weight") {
    assert((1 until g.n).forall(r => g.weights(r - 1) >= g.weights(r)))
  }

  test("rank 0 is the highest-weight vertex (id 0, weight 20)") {
    assert(g.origId(0) == 0L && g.weights(0) == 20.0)
  }

  test("adjHi holds only higher-weight (smaller-rank) neighbours") {
    assert((0 until g.n).forall(u => g.adjHi(u).forall(_ < u)))
  }

  test("adjLo holds only lower-weight (larger-rank) neighbours") {
    assert((0 until g.n).forall(u => g.adjLo(u).forall(_ > u)))
  }

  test("adjacency lists are sorted ascending") {
    assert((0 until g.n).forall { u =>
      g.adjHi(u).toSeq == g.adjHi(u).toSeq.sorted && g.adjLo(u).toSeq == g.adjLo(u).toSeq.sorted
    })
  }

  test("every edge appears in exactly one adjHi and one adjLo") {
    val fromHi = (0 until g.n).flatMap(u => g.adjHi(u).map(v => (v, u))).toSet
    val fromLo = (0 until g.n).flatMap(u => g.adjLo(u).map(v => (u, v))).toSet
    assert(fromHi == fromLo)
  }

  test("m counts each undirected edge once") {
    assert(g.m == 6 + 6 + 3 + 3 + 4 + 1) // two 4-cliques + pendants + bridge
  }

  test("size = |V| + |E|") {
    assert(g.size == g.n + g.m)
  }

  test("self-loops are dropped and parallel edges deduped") {
    val h = WGraph(Seq(1L -> 2.0, 2L -> 1.0), Seq((1L, 2L), (2L, 1L), (1L, 1L)))
    assert(h.m == 1)
  }

  test("weight ties are broken by ascending id") {
    val h = WGraph(Seq(5L -> 1.0, 3L -> 1.0, 4L -> 1.0), Nil)
    assert(h.origId.toSeq == Seq(3L, 4L, 5L))
  }

  test("unknown edge endpoint is rejected") {
    intercept[IllegalArgumentException] {
      WGraph(Seq(1L -> 1.0), Seq((1L, 99L)))
    }
  }

  test("cumSize is strictly increasing") {
    assert((1 to g.n).forall(p => g.cumSize(p) > g.cumSize(p - 1)))
  }

  test("prefixSize(p) counts prefix vertices plus internal edges") {
    for (p <- 0 to g.n) {
      val inPrefix = (0 until p).toSet
      val edges = (0 until p).map(u => g.adjHi(u).count(inPrefix)).sum
      assert(g.prefixSize(p) == p + edges)
    }
  }

  test("growTo returns the smallest prefix reaching the target") {
    for (target <- 0L to g.size) {
      val p = g.growTo(target)
      assert(g.cumSize(p) >= target)
      assert(p == 0 || g.cumSize(p - 1) < target)
    }
  }

  test("degIn matches a direct count, for every prefix") {
    for (p <- 1 to g.n; u <- 0 until p) {
      val expected = (g.adjHi(u) ++ g.adjLo(u)).count(_ < p)
      assert(g.degIn(u, p) == expected, s"degIn($u, $p)")
    }
  }

  test("foreachNeighborIn visits exactly the in-prefix neighbours") {
    for (p <- 1 to g.n; u <- 0 until p) {
      val buf = scala.collection.mutable.ArrayBuffer.empty[Int]
      g.foreachNeighborIn(u, p)(buf += _)
      val expected = (g.adjHi(u) ++ g.adjLo(u)).filter(_ < p).toSet
      assert(buf.toSet == expected && buf.size == expected.size)
    }
  }

  test("rankOf inverts origId") {
    assert((0 until g.n).forall(r => g.rankOf(g.origId(r)) == r))
  }

  test("fromRanked accepts any edge orientation") {
    val w = Array(3.0, 2.0, 1.0)
    val ids = Array(0L, 1L, 2L)
    val a = WGraph.fromRanked(w, ids, Seq((0, 1), (2, 1)))
    val b = WGraph.fromRanked(w, ids, Seq((1, 0), (1, 2)))
    assert(a.m == 2 && b.m == 2)
    assert(a.adjHi(1).toSeq == b.adjHi(1).toSeq)
  }

  test("random graphs: degree sum equals 2m") {
    for (seed <- 1 to 5) {
      val h = GraphGen.localRandom(60, 4.0, seed)
      val degSum = (0 until h.n).map(u => h.adjHi(u).length + h.adjLo(u).length).sum
      assert(degSum == 2 * h.m)
    }
  }

  test("random graphs: weights are distinct") {
    val h = GraphGen.localRandom(80, 3.0, 9)
    assert(h.weights.distinct.length == h.n)
  }
}
