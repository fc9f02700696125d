package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.roadnet.RoadNetwork
import repro.traj.Trip

/** End-to-end offline construction of the L2R routing infrastructure —
  * the three steps of Figure 2:
  *
  *  1. cluster the trajectory graph into regions and build the region graph
  *     (T-edges from trajectories, B-edges from BFS);
  *  2. learn a routing preference per T-edge and transfer preferences to
  *     B-edges by graph transduction;
  *  3. materialise preference-optimal paths for B-edges.
  *
  * Stage wall-clock times are recorded for the offline-processing-time
  * comparison in Section VII-C.
  */
object L2RPipeline {

  final case class Params(
      amr: Double = 0.7,
      mu1: Double = 1.0,
      mu2: Double = 0.01,
      graph: RegionGraph.Params = RegionGraph.Params(),
      tcsPerSide: Int = 2)

  final case class Model(
      index: RegionGraphIndex,
      regions: Seq[Clustering.Region],
      learned: Seq[PreferenceLearning.LearnedPref],
      transfer: PreferenceTransfer.TransferResult,
      /** millis: (clustering+regionGraph, learn, transfer, applyPaths) */
      stageMillis: (Long, Long, Long, Long)) {
    def router(net: RoadNetwork): L2RRouter = new L2RRouter(net, index)
    def nTEdges: Int = index.edges.values.count(_.isT)
    def nBEdges: Int = index.edges.values.count(!_.isT)
  }

  private def timed[A](f: => A): (A, Long) = {
    val t0 = System.nanoTime(); val a = f; (a, (System.nanoTime() - t0) / 1000000)
  }

  def fit(spark: SparkSession, net: RoadNetwork, trainTrips: Dataset[Trip],
          params: Params = Params()): Model = {
    trainTrips.persist()
    // Step 0+1: trajectory graph → regions → region graph
    val ((regions, index0), tGraph) = timed {
      val clusterEdges = TrajectoryGraph.clusterInput(trainTrips, net)
      val regions = Clustering.cluster(clusterEdges)
      (regions, RegionGraph.build(spark, net, trainTrips, regions, params.graph))
    }

    // Step 1 (Section V): learn preferences for T-edges
    val (learned, tLearn) = timed {
      val tedges = index0.edges.values.filter(_.isT).map { e =>
        PreferenceLearning.TEdgePaths(e.ri, e.rj,
          e.paths.map(_.verts), e.paths.map(_.count))
      }.toSeq
      PreferenceLearning.learn(spark, net, tedges)
    }
    val learnedMap = learned.map(lp => ((math.min(lp.ri, lp.rj), math.max(lp.ri, lp.rj)), lp)).toMap

    // Step 2: transfer preferences to B-edges
    val (transferRes, tTransfer) = timed {
      val feats = PreferenceTransfer.features(index0, learnedMap)
      PreferenceTransfer.transfer(spark, feats, params.amr, params.mu1, params.mu2)
    }

    // Step 3: apply preferences — materialise B-edge paths
    val (index, tApply) = timed {
      BEdgePaths.materialise(spark, net, index0, transferRes.prefs, params.tcsPerSide)
    }
    trainTrips.unpersist()

    Model(index, regions, learned, transferRes, (tGraph, tLearn, tTransfer, tApply))
  }
}
