package repro.core

import org.apache.spark.sql.functions._
import repro.traj.Trip
import repro.{Oracle, SparkSpec, TestNets}

class TrajectoryGraphSpec extends SparkSpec {
  import spark.implicits._

  private val net = TestNets.line(8)
  private def ds(trips: Seq[Trip]) = spark.createDataset(trips)

  private val trips = Seq(
    Trip(0, 0, Seq(0, 1, 2, 3), 10),
    Trip(1, 1, Seq(1, 2, 3, 4), 10),
    Trip(2, 0, Seq(3, 2, 1), 10), // reverse direction — same undirected edges
    Trip(3, 2, Seq(5, 6), 10))

  test("tripEdges canonicalises undirected edges (u < v)") {
    val e = TrajectoryGraph.tripEdges(ds(trips)).collect()
    assert(e.forall(r => r.getAs[Int]("u") < r.getAs[Int]("v")))
  }

  test("tripEdges deduplicates edges within a trip") {
    val loop = Seq(Trip(0, 0, Seq(0, 1, 0, 1), 1))
    val e = TrajectoryGraph.tripEdges(ds(loop)).collect()
    assert(e.length === 1)
  }

  test("edge popularity counts distinct trajectories per undirected edge") {
    val pop = TrajectoryGraph.edgePopularity(ds(trips)).collect()
      .map(r => (r.getAs[Int]("u"), r.getAs[Int]("v")) -> r.getAs[Long]("pop")).toMap
    assert(pop((1, 2)) === 3) // trips 0, 1, 2
    assert(pop((2, 3)) === 3)
    assert(pop((0, 1)) === 1)
    assert(pop((3, 4)) === 1)
    assert(pop((5, 6)) === 1)
  }

  test("edge popularity matches the DuckDB oracle") {
    val edges = TrajectoryGraph.tripEdges(ds(trips))
    val sparkAgg = edges.groupBy("u", "v").agg(count(lit(1)).cast("long").as("pop"))
      .select(col("u").cast("string").as("u"), col("v").cast("string").as("v"), col("pop").cast("string").as("pop"))
    Oracle.assertEquivalent(sparkAgg,
      "SELECT u, v, CAST(COUNT(*) AS VARCHAR) AS pop FROM te GROUP BY u, v",
      "te" -> edges)
  }

  test("vertex popularity is the sum of incident edge popularities") {
    val pop = TrajectoryGraph.vertexPopularity(TrajectoryGraph.edgePopularity(ds(trips)))
      .collect().map(r => r.getAs[Int]("v") -> r.getAs[Long]("pop")).toMap
    assert(pop(2) === 6) // (1,2)=3 + (2,3)=3
    assert(pop(0) === 1)
    assert(pop(4) === 1)
  }

  test("vertex popularity matches the DuckDB oracle") {
    val edgePop = TrajectoryGraph.edgePopularity(ds(trips))
    val sparkAgg = TrajectoryGraph.vertexPopularity(edgePop)
      .select(col("v").cast("string").as("v"), col("pop").cast("string").as("pop"))
    Oracle.assertEquivalent(sparkAgg,
      "SELECT v, CAST(SUM(CAST(pop AS BIGINT)) AS VARCHAR) AS pop FROM " +
      "(SELECT u AS v, pop FROM ep UNION ALL SELECT v, pop FROM ep) GROUP BY v",
      "ep" -> edgePop)
  }

  test("clusterInput attaches road types from the network") {
    val input = TrajectoryGraph.clusterInput(ds(trips), net)
    assert(input.nonEmpty)
    assert(input.forall(_.rt === 6)) // TestNets.line uses residential
    assert(input.find(e => e.u == 1 && e.v == 2).get.pop === 3.0)
  }

  test("single-vertex paths contribute no edges") {
    val e = TrajectoryGraph.tripEdges(ds(Seq(Trip(0, 0, Seq(4), 1)))).collect()
    assert(e.isEmpty)
  }

  test("popularity of uncovered edges is absent, not zero") {
    val pop = TrajectoryGraph.edgePopularity(ds(trips)).collect()
      .map(r => (r.getAs[Int]("u"), r.getAs[Int]("v"))).toSet
    assert(!pop.contains((4, 5))) // edge exists in the line net but no trip used it
  }
}
