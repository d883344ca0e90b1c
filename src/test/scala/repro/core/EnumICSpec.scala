package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures
import repro.gen.GraphGen
import repro.ref.Naive

class EnumICSpec extends AnyFunSuite {

  private def enumerate(g: repro.graph.WGraph, gamma: Int, k: Int): Seq[Community] = {
    val res = CountIC.run(g, g.n, gamma)
    val idx = new CommunityIndex(g)
    val from = math.max(0, res.keys.length - k)
    idx.process(res, g.n, from)
    (res.keys.length - 1 to from by -1).map(i => idx.community(res.keys(i)))
  }

  test("paperLike γ=3 top-5 communities match the expected fixture") {
    val got = enumerate(Fixtures.paperLike, 3, 5)
    assert(got.map(c => (c.influence, c.members.toSet)) == Fixtures.paperLikeTop)
  }

  test("communities come out in decreasing influence order") {
    val got = enumerate(GraphGen.localPowerLaw(100, 5, 5), 3, 20)
    assert(got.map(_.influence).sliding(2).forall { case Seq(a, b) => a > b; case _ => true })
  }

  test("nested communities share members (12 contains 17's clique)") {
    val got = enumerate(Fixtures.paperLike, 3, 5)
    val by = got.map(c => c.influence -> c.members.toSet).toMap
    assert(by(17.0).subsetOf(by(12.0)))
    assert(by(13.0).subsetOf(by(11.0)))
    assert(got.map(_.members.toSet).forall(_.subsetOf(by(10.0))))
  }

  test("memberRanks memoisation: repeated materialisation is identical") {
    val g = Fixtures.paperLike
    val res = CountIC.run(g, g.n, 3)
    val idx = new CommunityIndex(g)
    idx.process(res, g.n, 0)
    val k = res.keys(0)
    assert(idx.community(k).members.toSeq == idx.community(k).members.toSeq)
  }

  test("communitySize agrees with materialised size") {
    val g = GraphGen.localPowerLaw(100, 5, 11)
    val res = CountIC.run(g, g.n, 3)
    val idx = new CommunityIndex(g)
    idx.process(res, g.n, 0)
    for (u <- res.keys)
      assert(idx.communitySize(u) == idx.community(u).members.length)
  }

  test("last-k restriction produces the same communities as full processing") {
    val g = GraphGen.localPowerLaw(90, 5, 6)
    val full = enumerate(g, 3, Int.MaxValue)
    val top3 = enumerate(g, 3, 3)
    assert(top3.map(c => (c.influence, c.members.toSeq)) ==
           full.take(3).map(c => (c.influence, c.members.toSeq)))
  }

  for (seed <- 1 to 8; gamma <- 2 to 4)
    test(s"every enumerated community matches the naive IC (seed=$seed γ=$gamma)") {
      val g = GraphGen.localRandom(40, 5.0, seed)
      val res = CountIC.run(g, g.n, gamma)
      val idx = new CommunityIndex(g)
      idx.process(res, g.n, 0)
      for (u <- res.keys) {
        val got = idx.community(u).members.toSeq
        val expected = Naive.communityOf(g, gamma, u).get.map(g.origId).sorted.toSeq
        assert(got == expected, s"IC of key rank $u")
      }
    }

  for (seed <- 1 to 4)
    test(s"communities satisfy connectivity and cohesiveness (seed=$seed)") {
      val g = GraphGen.localPowerLaw(80, 5, seed)
      val gamma = 3
      for (c <- enumerate(g, gamma, 10)) {
        val ranks = c.members.map(g.rankOf).toSet
        // cohesive: min internal degree ≥ γ
        for (u <- ranks) {
          var d = 0
          g.foreachNeighborIn(u, g.n)(w => if (ranks(w)) d += 1)
          assert(d >= gamma, s"vertex ${g.origId(u)} degree $d < $gamma")
        }
        // connected: BFS from the keynode covers all members
        val comp = repro.graph.GraphOps.components(g, ranks.toArray, g.n)
        assert(comp.count(_ >= 0) == ranks.size && comp.filter(_ >= 0).distinct.length == 1)
      }
    }
}
