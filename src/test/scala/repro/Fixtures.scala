package repro

import repro.graph.WGraph

/** Hand-built graphs with known community structure, used for exact-value
  * tests (the paper's own figures don't list their edge sets, so we mirror
  * their structure: two 4-cliques, pendant extensions, a low-weight bridge).
  */
object Fixtures {

  /** The "paper-like" graph.
    *
    * Weights: id0=20 id1=19 id2=18 id3=17 | id5=16 id6=15 id7=14 id8=13 |
    *          id4=12 id9=11 id10=10 id11=5.
    *
    * Structure: clique A = {0,1,2,3}; vertex 4 adjacent to {0,1,2};
    * clique B = {5,6,7,8}; vertex 9 adjacent to {5,6,7}; bridge 10 adjacent
    * to {0,1,5,6}; pendant 11 adjacent to {0}.
    *
    * For γ = 3 the influential γ-communities are (influence: members):
    *   17: {0,1,2,3}   13: {5,6,7,8}   12: {0,1,2,3,4}
    *   11: {5,6,7,8,9} 10: {0,...,10}
    * NC communities: 17 and 13. For γ = 4 (truss) the influential 4-truss
    * communities are 17:{0..3}, 13:{5..8}, 12:{0..4}, 11:{5..9}.
    */
  lazy val paperLike: WGraph = {
    val weights = Seq[(Long, Double)](
      0L -> 20, 1L -> 19, 2L -> 18, 3L -> 17,
      5L -> 16, 6L -> 15, 7L -> 14, 8L -> 13,
      4L -> 12, 9L -> 11, 10L -> 10, 11L -> 5,
    )
    def clique(ids: Seq[Long]): Seq[(Long, Long)] =
      for (i <- ids.indices; j <- i + 1 until ids.size) yield (ids(i), ids(j))
    val edges = clique(Seq(0L, 1L, 2L, 3L)) ++ clique(Seq(5L, 6L, 7L, 8L)) ++
      Seq[(Long, Long)](
        (4L, 0L), (4L, 1L), (4L, 2L),
        (9L, 5L), (9L, 6L), (9L, 7L),
        (10L, 0L), (10L, 1L), (10L, 5L), (10L, 6L),
        (11L, 0L),
      )
    WGraph(weights, edges)
  }

  /** Expected top-5 (influence → member ids) for γ = 3 on [[paperLike]]. */
  val paperLikeTop: Seq[(Double, Set[Long])] = Seq(
    17.0 -> Set(0L, 1L, 2L, 3L),
    13.0 -> Set(5L, 6L, 7L, 8L),
    12.0 -> Set(0L, 1L, 2L, 3L, 4L),
    11.0 -> Set(5L, 6L, 7L, 8L, 9L),
    10.0 -> Set(0L, 1L, 2L, 3L, 4L, 5L, 6L, 7L, 8L, 9L, 10L),
  )

  /** Expected NC communities for γ = 3. */
  val paperLikeNc: Seq[(Double, Set[Long])] = Seq(
    17.0 -> Set(0L, 1L, 2L, 3L),
    13.0 -> Set(5L, 6L, 7L, 8L),
  )

  /** Expected influential 4-truss communities (decreasing influence). */
  val paperLikeTruss4: Seq[(Double, Set[Long])] = Seq(
    17.0 -> Set(0L, 1L, 2L, 3L),
    13.0 -> Set(5L, 6L, 7L, 8L),
    12.0 -> Set(0L, 1L, 2L, 3L, 4L),
    11.0 -> Set(5L, 6L, 7L, 8L, 9L),
  )

  /** A tiny triangle-free graph: no 3-communities at all. */
  lazy val star: WGraph = WGraph(
    (0L to 5L).map(i => i -> (10.0 - i)),
    (1L to 5L).map(i => (0L, i)),
  )
}
