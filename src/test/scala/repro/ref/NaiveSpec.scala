package repro.ref

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

/** The naive oracle itself must be right on the hand-checked fixture —
  * otherwise every property test downstream is circular.
  */
class NaiveSpec extends AnyFunSuite {

  private val g = Fixtures.paperLike

  test("keynodes on paperLike γ=3 are ids {10,9,4,8,3} in increasing weight order") {
    assert(Naive.keynodes(g, 3).map(g.origId) == Seq(10L, 9L, 4L, 8L, 3L))
  }

  test("communityOf reproduces each fixture community") {
    for ((influence, members) <- Fixtures.paperLikeTop) {
      val keyRank = g.rankOf(members.minBy(id => g.weights(g.rankOf(id))))
      val got = Naive.communityOf(g, 3, keyRank).get.map(g.origId).toSet
      assert(got == members, s"influence $influence")
    }
  }

  test("communityOf is None for a non-keynode") {
    assert(Naive.communityOf(g, 3, g.rankOf(0L)).isEmpty) // highest-weight vertex
  }

  test("topK orders by decreasing influence") {
    val got = Naive.topK(g, 5, 3).map(c => (c.influence, c.members.toSet))
    assert(got == Fixtures.paperLikeTop)
  }

  test("ncKeynodes on paperLike are the two clique keys") {
    assert(Naive.ncKeynodes(g, 3).map(g.origId).toSet == Set(3L, 8L))
  }

  test("gammaTrussEdges keeps both 4-cliques for γ=4") {
    val edges = Naive.gammaTrussEdges(g, 4, g.n)
    val ids = edges.flatMap { case (a, b) => Seq(g.origId(a), g.origId(b)) }
    assert(ids == Set(0L, 1L, 2L, 3L, 4L, 5L, 6L, 7L, 8L, 9L))
  }

  test("trussKeynodes on paperLike γ=4") {
    assert(Naive.trussKeynodes(g, 4).map(g.origId) == Seq(9L, 4L, 8L, 3L))
  }

  test("topKTruss matches the truss fixture") {
    val got = Naive.topKTruss(g, 4, 4).map(c => (c.influence, c.members.toSet))
    assert(got == Fixtures.paperLikeTruss4)
  }

  test("star graph has no keynodes for γ=2") {
    assert(Naive.keynodes(Fixtures.star, 2).isEmpty)
  }
}
