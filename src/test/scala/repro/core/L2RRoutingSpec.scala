package repro.core

import repro.roadnet.{CostType, Preference}
import repro.{SparkSpec, TestNets}

class L2RRoutingSpec extends SparkSpec {

  // Line 0..9 with regions A={0,1,2}, B={5,6}, C={8,9}
  private val net = TestNets.line(10)
  private val regions = Seq(
    Clustering.Region(0, Set(0, 1, 2)),
    Clustering.Region(1, Set(5, 6)),
    Clustering.Region(2, Set(8, 9)))
  private val vrm = Clustering.assignment(regions)

  private def mkIndex(edges: Map[(Int, Int), RegionEdgeData],
                      inner: Map[Int, Seq[PathRec]] = Map.empty): RegionGraphIndex = {
    val infos = regions.map { r =>
      r.id -> RegionGraph.regionInfo(net, r, r.members.toArray.sorted, 2)
    }.toMap
    new RegionGraphIndex(infos, vrm, edges, inner)
  }

  private val idx = mkIndex(
    Map(
      (0, 1) -> RegionEdgeData(0, 1, isT = true, Seq(PathRec(Seq(2, 3, 4, 5), 3)), None),
      (1, 2) -> RegionEdgeData(1, 2, isT = true, Seq(PathRec(Seq(6, 7, 8), 2)), None)),
    Map(0 -> Seq(PathRec(Seq(0, 1, 2), 5))))

  private val router = new L2RRouter(net, idx)

  test("removeCycles keeps simple paths untouched") {
    assert(router.removeCycles(Vector(1, 2, 3)) === Vector(1, 2, 3))
  }

  test("removeCycles cuts loops back to the first visit") {
    assert(router.removeCycles(Vector(1, 2, 3, 2, 4)) === Vector(1, 2, 4))
    assert(router.removeCycles(Vector(1, 2, 1, 2, 3)) === Vector(1, 2, 3))
  }

  test("same-region routing follows the most-traversed inner path") {
    assert(router.route(0, 2) === Vector(0, 1, 2))
    assert(router.innerRoute(0, 0, 1) === Vector(0, 1))
  }

  test("same-region routing falls back to fastest when no inner path matches") {
    assert(router.innerRoute(0, 2, 0) === Vector(2, 1, 0)) // inner path is 0→2 only
  }

  test("region path prefers the direct region edge") {
    assert(router.regionPath(0, 1).get === Seq(0, 1))
  }

  test("region path chains edges when no direct edge exists") {
    assert(router.regionPath(0, 2).get === Seq(0, 1, 2))
  }

  test("region path returns None when regions are unreachable") {
    val lonely = mkIndex(Map((0, 1) -> RegionEdgeData(0, 1, isT = true, Seq(PathRec(Seq(2, 3, 4, 5), 1)), None)))
    val r = new L2RRouter(net, lonely)
    assert(r.regionPath(0, 2).isEmpty)
  }

  test("cross-region routing stitches T-edge paths") {
    val p = router.route(0, 9)
    assert(p.head === 0 && p.last === 9)
    assert(net.isValidPath(p))
    // must reuse the stored paths 2-3-4-5 and 6-7-8
    assert(p.containsSlice(Vector(2, 3, 4, 5)))
    assert(p.containsSlice(Vector(6, 7, 8)))
  }

  test("representativePath orients paths in travel direction") {
    assert(router.representativePath(0, 1).get === Vector(2, 3, 4, 5))
    assert(router.representativePath(1, 0).get === Vector(5, 4, 3, 2))
  }

  test("routing from outside any region reaches the nearest region first") {
    // vertex 3 is outside; nearest regions: A (via 2) or B (via 5)
    val p = router.route(3, 9)
    assert(p.head === 3 && p.last === 9)
    assert(net.isValidPath(p))
  }

  test("routing to outside any region appends a fastest tail") {
    val p = router.route(0, 7)
    assert(p.head === 0 && p.last === 7)
    assert(net.isValidPath(p))
  }

  test("degenerate request s == d") {
    assert(router.route(4, 4) === Vector(4))
  }

  test("B-edge paths participate in routing like T-edge paths") {
    val withB = mkIndex(Map(
      (0, 1) -> RegionEdgeData(0, 1, isT = true, Seq(PathRec(Seq(2, 3, 4, 5), 3)), None),
      (1, 2) -> RegionEdgeData(1, 2, isT = false, Seq(PathRec(Seq(6, 7, 8), 0)),
        Some(Preference(CostType.TT, None)))))
    val r = new L2RRouter(net, withB)
    val p = r.route(0, 9)
    assert(p.containsSlice(Vector(6, 7, 8)))
  }

  test("falls back to fastest when the region graph cannot help") {
    val empty = new RegionGraphIndex(Map.empty, Map.empty, Map.empty, Map.empty)
    val r = new L2RRouter(net, empty)
    assert(r.route(0, 9) === net.dijkstra(0, 9, _.tt).get)
  }

  test("nearestRegionFrom/To resolve in-region vertices to their own region") {
    assert(router.nearestRegionFrom(1) === Some(0))
    assert(router.nearestRegionTo(6) === Some(1))
    assert(router.nearestRegionFrom(4).isDefined) // outside → some nearby region
  }
}
