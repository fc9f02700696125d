package repro.core

import repro.roadnet.{CostType, Preference}
import repro.{SparkSpec, TestNets}

class BEdgePathsSpec extends SparkSpec {

  private val net = TestNets.smallGrid(12, 10)

  test("pickTcs prefers transfer centers nearest the other region") {
    val far = net.n - 1 // opposite corner of the grid
    val a = RegionInfo(0, Array(0, 1, 2), 0.0, 0.0, Seq(6), Array(0, 11))
    val b = RegionInfo(1, Array(far), net.vertices(far).x, net.vertices(far).y, Seq(6), Array(far))
    val picked = BEdgePaths.pickTcs(net, a, b, 1)
    assert(picked === Seq(11)) // 11 (end of row 0) is closer to the far corner than 0
  }

  test("pickTcs falls back to members when no transfer centers exist") {
    val a = RegionInfo(0, Array(0, 1), 0.0, 0.0, Seq(6), Array.empty)
    val b = RegionInfo(1, Array(50), net.vertices(50).x, net.vertices(50).y, Seq(6), Array(50))
    assert(BEdgePaths.pickTcs(net, a, b, 2).nonEmpty)
  }

  test("routeTask with a preference uses the preference-aware Dijkstra") {
    val t = BEdgePaths.BEdgeTask(0, 1, CostType.DI.id, -1, Seq(0), Seq(net.n - 1))
    val r = BEdgePaths.routeTask(net, t)
    assert(r.paths.size === 1)
    assert(r.paths.head === net.dijkstra(0, net.n - 1, _.dist).get)
  }

  test("routeTask with a null preference falls back to fastest paths") {
    val t = BEdgePaths.BEdgeTask(0, 1, -1, -1, Seq(0), Seq(net.n - 1))
    val r = BEdgePaths.routeTask(net, t)
    assert(r.paths.head === net.dijkstra(0, net.n - 1, _.tt).get)
  }

  test("routeTask skips degenerate s==d pairs") {
    val t = BEdgePaths.BEdgeTask(0, 1, CostType.TT.id, -1, Seq(5), Seq(5))
    assert(BEdgePaths.routeTask(net, t).paths.isEmpty)
  }

  test("materialise attaches paths and preferences to every B-edge") {
    val regions = Seq(Clustering.Region(0, Set(0, 1)), Clustering.Region(1, Set(net.n - 1, net.n - 2)))
    val vrm = Clustering.assignment(regions)
    val infos = regions.map(r => r.id -> RegionGraph.regionInfo(net, r, r.members.toArray, 2)).toMap
    val idx = new RegionGraphIndex(infos, vrm,
      Map((0, 1) -> RegionEdgeData(0, 1, isT = false, Nil, None)), Map.empty)
    val pref = Some(Preference(CostType.DI, None))
    val out = BEdgePaths.materialise(spark, net, idx, Map((0, 1) -> pref))
    val e = out.edges((0, 1))
    assert(e.paths.nonEmpty)
    assert(e.pref === pref)
    e.paths.foreach(p => assert(net.isValidPath(p.verts.toVector)))
    // path endpoints live in the two regions (transfer-center fallback)
    e.paths.foreach { p =>
      assert(vrm.contains(p.verts.head) && vrm.contains(p.verts.last))
    }
  }

  test("materialise leaves T-edges' paths alone but records their preference") {
    val regions = Seq(Clustering.Region(0, Set(0)), Clustering.Region(1, Set(9)))
    val infos = regions.map(r => r.id -> RegionGraph.regionInfo(net, r, r.members.toArray, 2)).toMap
    val tPaths = Seq(PathRec(Seq(0, 1), 4))
    val idx = new RegionGraphIndex(infos, Clustering.assignment(regions),
      Map((0, 1) -> RegionEdgeData(0, 1, isT = true, tPaths, None)), Map.empty)
    val pref = Some(Preference(CostType.TT, Some(3)))
    val out = BEdgePaths.materialise(spark, net, idx, Map((0, 1) -> pref))
    assert(out.edges((0, 1)).paths === tPaths)
    assert(out.edges((0, 1)).pref === pref)
  }
}
