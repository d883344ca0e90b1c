package repro.spark

import org.apache.spark.graphx.Graph
import org.apache.spark.sql.{DataFrame, SparkSession}

/** Vertex influence weights à la the paper: PageRank with damping 0.85.
  *
  * Computed with GraphX over the undirected edge list (each edge contributes
  * both directions). The paper assumes distinct weights; ties (possible on
  * symmetric structures) are broken downstream by ordering on (weight, id).
  */
object PageRankWeights {

  /** @param edges DataFrame (src: Long, dst: Long), canonical simple edges
    * @return DataFrame (id: Long, weight: Double) for every endpoint vertex
    */
  def compute(spark: SparkSession, edges: DataFrame, iterations: Int = 20,
              damping: Double = 0.85): DataFrame = {
    import spark.implicits._
    val tuples = edges.select("src", "dst").as[(Long, Long)].rdd
      .flatMap { case (s, d) => Iterator((s, d), (d, s)) }
    val graph = Graph.fromEdgeTuples(tuples, defaultValue = 1)
    val ranks = graph.staticPageRank(iterations, resetProb = 1.0 - damping).vertices
    ranks.map { case (id, w) => (id, w) }.toDF("id", "weight")
  }
}
