package repro.spark

import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.storage.StorageLevel
import repro.graph.WGraph

/** The graph data management system of the reproduction: a weight-ordered
  * columnar store backed by DataFrames.
  *
  * This realises the only interface LocalSearch requires of its substrate
  * (§3.1 Remark): vertices retrievable in decreasing weight order together
  * with their higher-weight neighbourhoods. Ranks are assigned by a window
  * over (weight desc, id asc); every edge carries `maxRank` — the rank of
  * its lower-weight endpoint, which is exactly the paper's edge-weight sort
  * key — so the prefix subgraph `G≥τ` on the top-p ranks is the Catalyst
  * filter `maxRank < p`.
  *
  * Per the semi-external assumption ("memory holds constant information per
  * vertex"), the per-rank edge histogram is collected once to the driver to
  * drive the exponential growth of Alg. 1 without cluster round-trips.
  */
final class SparkGraphStore(
    /** (id, weight, rank); rank 0 = highest weight. */
    val vertices: DataFrame,
    /** (src, dst, srcRank, dstRank, maxRank). */
    val edges: DataFrame,
    /** cumEdges(p) = number of edges with maxRank < p (length n+1). */
    val cumEdges: Array[Long],
    /** Number of vertices. */
    val n: Int,
) {

  /** size (|V|+|E|) of the top-`p` prefix subgraph. */
  def prefixSize(p: Int): Long = p + cumEdges(p)

  /** Total graph size. */
  def size: Long = prefixSize(n)

  /** Smallest prefix with size ≥ target (mirror of WGraph.growTo). */
  def growTo(target: Long): Int = {
    var lo = 0
    var hi = n
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (mid + cumEdges(mid) >= target) hi = mid else lo = mid + 1
    }
    lo
  }

  /** Pull the top-`p` prefix out of the cluster as a local [[WGraph]]. */
  def collectPrefix(p: Int): WGraph = {
    val vRows = vertices.filter(col("rank") < p)
      .select("rank", "id", "weight").collect()
    val weights = new Array[Double](vRows.length)
    val ids = new Array[Long](vRows.length)
    vRows.foreach { r =>
      val rank = r.getInt(0)
      ids(rank) = r.getLong(1)
      weights(rank) = r.getDouble(2)
    }
    val pairs = edges.filter(col("maxRank") < p)
      .select("srcRank", "dstRank").collect()
      .map(r => (r.getInt(0), r.getInt(1)))
    WGraph.fromRanked(weights, ids, pairs)
  }

  /** The whole graph, local. */
  def toLocal: WGraph = collectPrefix(n)

  def unpersist(): Unit = {
    vertices.unpersist()
    edges.unpersist()
  }
}

object SparkGraphStore {

  /** Build the store from a simple undirected edge list and a weight table.
    * Vertices are edge-induced; `weightsDf` must cover every endpoint.
    */
  def build(spark: SparkSession, edgesDf: DataFrame, weightsDf: DataFrame): SparkGraphStore = {
    import spark.implicits._
    val ranked = weightsDf
      .withColumn("rank",
        (row_number().over(Window.orderBy(desc("weight"), asc("id"))) - 1).cast("int"))
      .persist(StorageLevel.MEMORY_AND_DISK)
    val n = ranked.count().toInt

    val e = edgesDf
      .join(ranked.select($"id".as("src"), $"rank".as("srcRank")), "src")
      .join(ranked.select($"id".as("dst"), $"rank".as("dstRank")), "dst")
      .withColumn("maxRank", greatest($"srcRank", $"dstRank"))
      .select("src", "dst", "srcRank", "dstRank", "maxRank")
      .persist(StorageLevel.MEMORY_AND_DISK)

    // Driver-side histogram of edges per maxRank (vertex-sized, allowed by
    // the semi-external memory model).
    val hist = new Array[Long](n + 1)
    e.groupBy("maxRank").count().collect().foreach { r =>
      hist(r.getInt(0) + 1) = r.getLong(1)
    }
    var p = 1
    while (p <= n) { hist(p) += hist(p - 1); p += 1 }

    new SparkGraphStore(ranked, e, hist, n)
  }
}
