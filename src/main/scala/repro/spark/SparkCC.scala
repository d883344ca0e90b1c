package repro.spark

import org.apache.spark.graphx.Graph
import org.apache.spark.sql.{DataFrame, SparkSession}

/** GraphX connected components, used as a distributed cross-check of the
  * local BFS (community maximality hinges on component structure).
  */
object SparkCC {

  /** (id, component) for every endpoint vertex of the edge list. */
  def components(spark: SparkSession, edges: DataFrame): DataFrame = {
    import spark.implicits._
    val tuples = edges.select("src", "dst").as[(Long, Long)].rdd
      .map { case (s, d) => (s, d) }
    val graph = Graph.fromEdgeTuples(tuples, defaultValue = 1)
    graph.connectedComponents().vertices
      .map { case (id, comp) => (id, comp) }
      .toDF("id", "component")
  }

  /** Number of connected components of the edge-induced graph. */
  def componentCount(spark: SparkSession, edges: DataFrame): Long =
    components(spark, edges).select("component").distinct().count()
}
