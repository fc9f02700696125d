package repro.core

import repro.traj.Trip
import repro.{SparkSpec, TestNets}

class RegionGraphSpec extends SparkSpec {
  import spark.implicits._

  // The motivating-example shape: a path A,J,X,Y,B3,B (ids 0..5) through
  // regions R1={0,1}, R6={2,3}, R2={4,5}; vertex 6 is in no region.
  private val regionOf = Map(0 -> 1, 1 -> 1, 2 -> 6, 3 -> 6, 4 -> 2, 5 -> 2)
  private def vr(v: Int): Int = regionOf.getOrElse(v, -1)

  test("segments compress consecutive same-region vertices") {
    val segs = RegionGraph.segments(Seq(0, 1, 2, 3, 4, 5), vr)
    assert(segs === Seq((1, 0, 1), (6, 2, 3), (2, 4, 5)))
  }

  test("segments skip non-region vertices") {
    val segs = RegionGraph.segments(Seq(0, 6, 2), vr)
    assert(segs === Seq((1, 0, 0), (6, 2, 2)))
  }

  test("a re-entered region produces two segments") {
    val segs = RegionGraph.segments(Seq(0, 2, 0, 1), vr)
    assert(segs === Seq((1, 0, 0), (6, 1, 1), (1, 2, 3)))
  }

  test("extract produces m(m-1)/2 T-edge rows for m distinct regions") {
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (tRows, _, _) = RegionGraph.extract(t, vr, maxSegs = 12)
    assert(tRows.size === 3) // (R1,R6), (R1,R2), (R6,R2)
    assert(tRows.map(r => (r.ri, r.rj)).toSet === Set((1, 6), (1, 2), (6, 2)))
  }

  test("extract reproduces the paper's T1 example boundary paths") {
    // T1 = ⟨A,J,X,Y,B3,B⟩: (R1,R6)→⟨J,X⟩, (R1,R2)→⟨J,X,Y,B3⟩, (R6,R2)→⟨Y,B3⟩
    // The stored fragment is extended (enter R_i → leave R_j); the paper's
    // boundary path is its [leaveOff, enterOff] slice.
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (tRows, _, _) = RegionGraph.extract(t, vr, 12)
    val byPair = tRows.map(r => (r.ri, r.rj) -> r.path.slice(r.leaveOff, r.enterOff + 1)).toMap
    assert(byPair((1, 6)) === Seq(1, 2))
    assert(byPair((1, 2)) === Seq(1, 2, 3, 4))
    assert(byPair((6, 2)) === Seq(3, 4))
  }

  test("extract's extended fragments span from entering R_i to leaving R_j") {
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (tRows, _, _) = RegionGraph.extract(t, vr, 12)
    val byPair = tRows.map(r => (r.ri, r.rj) -> r.path).toMap
    assert(byPair((1, 6)) === Seq(0, 1, 2, 3))       // A..Y
    assert(byPair((1, 2)) === Seq(0, 1, 2, 3, 4, 5)) // the whole trip
    assert(byPair((6, 2)) === Seq(2, 3, 4, 5))       // X..B
  }

  test("extract records inner-region paths (paper: ⟨A,J⟩ in R1)") {
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (_, inner, _) = RegionGraph.extract(t, vr, 12)
    assert(inner.map(i => (i.r, i.path)).toSet ===
      Set((1, Seq(0, 1)), (6, Seq(2, 3)), (2, Seq(4, 5))))
  }

  test("extract records transfer centers at segment boundaries") {
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (_, _, tcs) = RegionGraph.extract(t, vr, 12)
    val byRegion = tcs.groupBy(_.r).view.mapValues(_.map(_.v).toSet).toMap
    assert(byRegion(1) === Set(0, 1))
    assert(byRegion(6) === Set(2, 3))
    assert(byRegion(2) === Set(4, 5))
  }

  test("maxSegs caps the quadratic pair explosion") {
    val t = Trip(0, 0, Seq(0, 1, 2, 3, 4, 5), 1)
    val (tRows, _, _) = RegionGraph.extract(t, vr, maxSegs = 2)
    assert(tRows.size === 1)
  }

  test("tEdgePaths keeps the most popular paths per region pair") {
    val rows = spark.createDataset(Seq(
      RegionGraph.TEdgeRow(1, 2, Seq(0, 1, 2), 0, 2),
      RegionGraph.TEdgeRow(1, 2, Seq(0, 1, 2), 0, 2),
      RegionGraph.TEdgeRow(1, 2, Seq(0, 3, 2), 0, 2),
      RegionGraph.TEdgeRow(2, 1, Seq(2, 1, 0), 0, 2)))
    val m = RegionGraph.tEdgePaths(spark, rows, topN = 2)
    val paths = m((1, 2))
    assert(paths.size === 2)
    assert(paths.head.verts === Seq(0, 1, 2) && paths.head.count === 2)
  }

  test("innerPaths aggregates per region with counts") {
    val rows = spark.createDataset(Seq(
      RegionGraph.InnerRow(7, Seq(1, 2, 3)),
      RegionGraph.InnerRow(7, Seq(1, 2, 3)),
      RegionGraph.InnerRow(7, Seq(9, 8))))
    val m = RegionGraph.innerPaths(spark, rows, topN = 5)
    assert(m(7).head.verts === Seq(1, 2, 3))
    assert(m(7).head.count === 2)
  }

  test("transferCenters keeps the most frequent per region") {
    val rows = spark.createDataset(
      Seq.fill(3)(RegionGraph.TcRow(1, 10)) ++ Seq(RegionGraph.TcRow(1, 11)))
    val m = RegionGraph.transferCenters(spark, rows, topN = 1)
    assert(m(1).toSeq === Seq(10))
  }

  test("regionInfo computes centroid and top road types") {
    val net = TestNets.custom(
      Seq((0, 0), (2, 0), (1, 2)),
      Seq((0, 1, 2.0, 1), (1, 2, 1.5, 3), (0, 2, 1.0, 3)))
    val info = RegionGraph.regionInfo(net, Clustering.Region(0, Set(0, 1, 2)), Array(0), topK = 2)
    assert(math.abs(info.cx - 1.0) < 1e-9)
    assert(info.topRts === Seq(3, 1)) // rt3 total incident length 5 > rt1's 4
  }

  test("bEdges connect isolated regions via BFS without crossing regions") {
    // line 0..7; regions {0,1} and {6,7}; middle uncovered
    val net = TestNets.line(8)
    val regions = Seq(Clustering.Region(0, Set(0, 1)), Clustering.Region(1, Set(6, 7)))
    val vrm = Clustering.assignment(regions)
    val b = RegionGraph.bEdges(net, regions, vrm, existing = Set.empty)
    assert(b === Seq((0, 1)))
  }

  test("bEdges do not duplicate existing T-edges") {
    val net = TestNets.line(8)
    val regions = Seq(Clustering.Region(0, Set(0, 1)), Clustering.Region(1, Set(6, 7)))
    val vrm = Clustering.assignment(regions)
    assert(RegionGraph.bEdges(net, regions, vrm, existing = Set((0, 1))).isEmpty)
  }

  test("bEdges stop at the first region encountered (no tunnelling)") {
    // regions A={0,1}, B={3,4}, C={6,7} on a line: A reaches B but not C
    val net = TestNets.line(8)
    val regions = Seq(
      Clustering.Region(0, Set(0, 1)), Clustering.Region(1, Set(3, 4)), Clustering.Region(2, Set(6, 7)))
    val vrm = Clustering.assignment(regions)
    val b = RegionGraph.bEdges(net, regions, vrm, Set.empty)
    assert(b.toSet === Set((0, 1), (1, 2)))
    assert(!b.contains((0, 2)))
  }

  test("end-to-end build yields a connected region graph") {
    val net = TestNets.smallGrid(14, 10)
    val cfg = repro.traj.TrajectoryGen.Config(nTrips = 400, nDrivers = 8, nZones = 4,
      zoneRadiusKm = 0.8, seed = 31L)
    val trips = repro.traj.TrajectoryGen.generateLocal(net, cfg)
    val tripDs = spark.createDataset(trips)
    val clusterEdges = TrajectoryGraph.clusterInput(tripDs, net)
    val regions = Clustering.cluster(clusterEdges)
    val index = RegionGraph.build(spark, net, tripDs, regions)
    assert(index.regions.nonEmpty)
    assert(index.isConnected, "B-edges must make the region graph connected")
    assert(index.edges.values.exists(_.isT), "training data must produce T-edges")
    index.edges.values.filter(_.isT).foreach { e =>
      assert(e.paths.nonEmpty, s"T-edge ${e.key} must carry paths")
      e.paths.foreach(p => assert(p.count >= 1))
    }
    // every vertex-region assignment points to an existing region
    index.vertexRegion.values.foreach(r => assert(index.regions.contains(r)))
  }
}
