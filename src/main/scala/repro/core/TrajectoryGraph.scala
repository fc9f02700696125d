package repro.core

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._
import repro.roadnet.RoadNetwork
import repro.traj.Trip

/** The *trajectory graph* (Section IV-A): the sub-graph of the road network
  * traversed by trajectories, with popularity weights.
  *
  * Edge popularity s_ij = number of distinct trajectories that occurred on
  * the undirected edge (v_i, v_j); vertex popularity S_i = Σ_j s_ij. Both
  * are computed as distributed DataFrame aggregations.
  */
object TrajectoryGraph {

  /** Explode trips into distinct (trip, undirected edge) rows with columns
    * (id, u, v), u < v. Pure Spark SQL (Catalyst `transform` over the path
    * array), so the oracle can replay the grouping in DuckDB.
    */
  def tripEdges(trips: Dataset[Trip]): DataFrame = {
    trips.toDF()
      .select(col("id"),
        explode(expr(
          "transform(slice(path, 1, size(path) - 1), (x, i) -> " +
          "struct(least(x, element_at(path, i + 2)) as u, greatest(x, element_at(path, i + 2)) as v))"
        )).as("e"))
      .select(col("id"), col("e.u").as("u"), col("e.v").as("v"))
      .distinct()
  }

  /** Edge popularity: (u, v, pop) with u < v. */
  def edgePopularity(trips: Dataset[Trip]): DataFrame =
    tripEdges(trips).groupBy("u", "v").agg(count(lit(1)).as("pop"))

  /** Vertex popularity S_i from the edge popularity frame: (v, pop). */
  def vertexPopularity(edgePop: DataFrame): DataFrame =
    edgePop
      .select(explode(array(col("u"), col("v"))).as("v"), col("pop"))
      .groupBy("v").agg(sum("pop").as("pop"))

  /** Collect the clustering input: undirected popular edges annotated with
    * the road type from the network. The aggregated trajectory graph is
    * orders of magnitude smaller than the trip set, so collecting it for
    * the (inherently sequential) Algorithm 1 is cheap.
    */
  def clusterInput(trips: Dataset[Trip], net: RoadNetwork): Seq[Clustering.ClusterEdge] =
    edgePopularity(trips).collect().toSeq.map { r =>
      val u = r.getAs[Int]("u"); val v = r.getAs[Int]("v")
      val rt = net.edgeBetween(u, v).orElse(net.edgeBetween(v, u)).map(_.rt).getOrElse(6)
      Clustering.ClusterEdge(u, v, r.getAs[Long]("pop").toDouble, rt)
    }
}
