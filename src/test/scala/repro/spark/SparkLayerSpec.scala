package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.LocalSearch
import repro.gen.GraphGen
import repro.graph.GraphOps

class SparkLayerSpec extends SparkSpec {

  import spark.implicits._

  private lazy val edges = GraphGen.rmat(spark, scale = 9, edgeFactor = 4.0, seed = 5L).cache()
  private lazy val weights = PageRankWeights.compute(spark, edges).cache()
  private lazy val store = SparkGraphStore.build(spark, edges, weights)
  private lazy val local = store.toLocal

  // ---------------------------------------------------------------- generator

  test("rmat is deterministic in its seed") {
    val a = GraphGen.rmat(spark, 8, 3.0, 1L).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val b = GraphGen.rmat(spark, 8, 3.0, 1L).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val c = GraphGen.rmat(spark, 8, 3.0, 2L).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(a == b && a != c)
  }

  test("rmat edges are canonical (src < dst) with no duplicates [oracle]") {
    val dup = edges.groupBy("src", "dst").count().filter($"count" > 1)
      .agg(count(lit(1)).as("dups"))
    Oracle.assertEquivalent(dup,
      """SELECT count(*) AS dups FROM (
        |  SELECT src, dst, count(*) AS c FROM edges GROUP BY src, dst HAVING count(*) > 1
        |)""".stripMargin,
      "edges" -> edges)
    assert(edges.filter($"src" >= $"dst").isEmpty)
  }

  test("rmat degrees are skewed (power-law flavour)") {
    val degs = edges.select($"src".as("v")).unionAll(edges.select($"dst".as("v")))
      .groupBy("v").count().select(max("count"), avg("count"))
      .as[(Long, Double)].head()
    assert(degs._1 > 5 * degs._2, s"max ${degs._1} should dwarf avg ${degs._2}")
  }

  // ----------------------------------------------------------------- pagerank

  test("pagerank weights cover every endpoint and are positive") {
    val endpoints = edges.select($"src".as("id")).unionAll(edges.select($"dst".as("id"))).distinct()
    assert(weights.count() == endpoints.count())
    assert(weights.filter($"weight" <= 0).isEmpty)
  }

  test("pagerank mass is about one per vertex") {
    val (sum, n) = weights.agg(org.apache.spark.sql.functions.sum("weight"), count(lit(1)))
      .as[(Double, Long)].head()
    assert(math.abs(sum / n - 1.0) < 0.25, s"mean pagerank ${sum / n}")
  }

  test("pagerank is reproducible within a session") {
    val again = PageRankWeights.compute(spark, edges).withColumnRenamed("weight", "w2")
    val maxDiff = weights.join(again, "id")
      .agg(max(abs($"weight" - $"w2")).as("d")).as[Double].head()
    assert(maxDiff < 1e-9, s"pagerank drift $maxDiff")
  }

  test("hubs rank high: top pagerank vertex has above-average degree") {
    val topId = weights.orderBy(desc("weight")).select("id").as[Long].head()
    val degOf = edges.filter($"src" === topId || $"dst" === topId).count()
    val avgDeg = 2.0 * edges.count() / weights.count()
    assert(degOf > avgDeg)
  }

  // -------------------------------------------------------------------- store

  test("store rank assignment matches DuckDB row_number [oracle]") {
    val ranked = store.vertices.select($"id", $"rank")
    Oracle.assertEquivalent(ranked,
      """SELECT id,
        |       row_number() OVER (ORDER BY CAST(weight AS DOUBLE) DESC, CAST(id AS BIGINT)) - 1 AS rank
        |FROM weights""".stripMargin,
      "weights" -> weights)
  }

  test("store edge ranks are consistent with the vertex table [oracle]") {
    val joined = store.edges.select($"src", $"dst", $"srcRank", $"dstRank")
    Oracle.assertEquivalent(joined,
      """WITH ranked AS (
        |  SELECT id,
        |         row_number() OVER (ORDER BY CAST(weight AS DOUBLE) DESC, CAST(id AS BIGINT)) - 1 AS rank
        |  FROM weights)
        |SELECT e.src, e.dst, rs.rank AS srcRank, rd.rank AS dstRank
        |FROM edges e
        |JOIN ranked rs ON rs.id = e.src
        |JOIN ranked rd ON rd.id = e.dst""".stripMargin,
      "edges" -> edges, "weights" -> weights)
  }

  test("degree computation matches DuckDB [oracle]") {
    val degDf = edges.select($"src".as("id")).unionAll(edges.select($"dst".as("id")))
      .groupBy("id").agg(count(lit(1)).as("deg"))
    Oracle.assertEquivalent(degDf,
      """SELECT id, count(*) AS deg FROM (
        |  SELECT src AS id FROM edges UNION ALL SELECT dst AS id FROM edges
        |) GROUP BY id""".stripMargin,
      "edges" -> edges)
  }

  test("cumEdges histogram matches a per-threshold DuckDB count [oracle]") {
    for (p <- Seq(1, store.n / 4, store.n / 2, store.n)) {
      val cnt = store.edges.filter($"maxRank" < p).agg(count(lit(1)).as("edges_below"))
      Oracle.assertEquivalent(cnt,
        s"SELECT count(*) AS edges_below FROM se WHERE CAST(maxRank AS INT) < $p",
        "se" -> store.edges)
      assert(store.cumEdges(p) ==
        store.edges.filter($"maxRank" < p).count())
    }
  }

  test("store prefix sizes match the local graph") {
    assert(local.n == store.n)
    for (p <- Seq(0, 1, store.n / 3, store.n))
      assert(store.prefixSize(p) == local.prefixSize(p), s"p=$p")
  }

  test("toLocal round-trips ids, weights and edge count") {
    assert(local.m == edges.count())
    val wById = weights.as[(Long, Double)].collect().toMap
    assert((0 until local.n).forall(r => wById(local.origId(r)) == local.weights(r)))
  }

  // ------------------------------------------------------------------- k-core

  test("SparkKCore matches the local γ-core") {
    for (gamma <- Seq(2, 4)) {
      val distributed = SparkKCore.coreVertices(edges, gamma).as[Long].collect().toSet
      val localCore = GraphOps.gammaCore(local, gamma, local.n).map(local.origId).toSet
      assert(distributed == localCore, s"γ=$gamma")
    }
  }

  test("SparkCC component count matches a local union-find") {
    val cnt = SparkCC.componentCount(spark, edges)
    val ranks = (0 until local.n).filter(u => local.adjHi(u).nonEmpty || local.adjLo(u).nonEmpty)
    val comp = GraphOps.components(local, ranks.toArray, local.n)
    val localCnt = comp.filter(_ >= 0).distinct.length
    assert(cnt == localCnt)
  }

  test("per-component minimum weight matches DuckDB [oracle]") {
    val comps = SparkCC.components(spark, edges)
    val minW = comps.join(weights, "id").groupBy("component")
      .agg(min("weight").as("min_weight"))
    Oracle.assertEquivalent(minW,
      """SELECT component, min(CAST(weight AS DOUBLE)) AS min_weight
        |FROM comps JOIN weights USING (id) GROUP BY component""".stripMargin,
      "comps" -> comps, "weights" -> weights)
  }

  // --------------------------------------------------------- DistLocalSearch

  test("DistLocalSearch equals local LocalSearch") {
    for (k <- Seq(1, 5, 10)) {
      val (dist, distStats) = DistLocalSearch.topK(store, k, 4)
      val (loc, locStats) = LocalSearch.topK(local, k, 4)
      assert(dist.map(c => (c.influence, c.members.toSet)) ==
             loc.map(c => (c.influence, c.members.toSet)), s"k=$k")
      assert(distStats.finalPrefix == locStats.finalPrefix)
    }
  }

  test("DistLocalSearch accesses a strict subgraph on a local query") {
    val (found, stats) = DistLocalSearch.topK(store, 1, 2)
    assert(found.nonEmpty)
    assert(stats.accessedSize < store.size)
  }
}
