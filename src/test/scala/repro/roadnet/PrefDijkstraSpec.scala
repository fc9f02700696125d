package repro.roadnet

import repro.{SparkSpec, TestNets}

/** Tests of the paper's Algorithm 2 (preference-aware Dijkstra). */
class PrefDijkstraSpec extends SparkSpec {

  // Diamond: top route is motorway (fast, long), bottom is residential
  // (short, slow). 0 → 1 → 3 (top, rt 1), 0 → 2 → 3 (bottom, rt 6).
  private val diamond = TestNets.custom(
    Seq((0, 0), (1, 1), (1, -1), (2, 0)),
    Seq((0, 1, 2.0, 1), (1, 3, 2.0, 1), (0, 2, 1.0, 6), (2, 3, 1.0, 6)))

  test("no slave feature reduces to plain Dijkstra on the master cost") {
    val p = diamond.prefDijkstra(0, 3, Preference(CostType.DI, None))
    assert(p === diamond.dijkstra(0, 3, _.dist))
    assert(p.get === Vector(0, 2, 3))
  }

  test("master=TT picks the motorway route") {
    assert(diamond.prefDijkstra(0, 3, Preference(CostType.TT, None)).get === Vector(0, 1, 3))
  }

  test("master=DI picks the short residential route") {
    assert(diamond.prefDijkstra(0, 3, Preference(CostType.DI, None)).get === Vector(0, 2, 3))
  }

  test("slave preference overrides the master optimum") {
    // minimise distance but prefer motorway edges → forced onto the top route
    val p = diamond.prefDijkstra(0, 3, Preference(CostType.DI, Some(1))).get
    assert(p === Vector(0, 1, 3))
  }

  test("slave preference for residential keeps the bottom route") {
    val p = diamond.prefDijkstra(0, 3, Preference(CostType.TT, Some(6))).get
    assert(p === Vector(0, 2, 3))
  }

  test("vertices with no satisfying edge explore all edges (noneSat rule)") {
    // line of mixed types: 0-(rt6)-1-(rt3)-2 ; prefer rt 3: vertex 0 has no
    // rt-3 edge so the rt-6 edge must still be usable.
    val net = TestNets.custom(Seq((0, 0), (1, 0), (2, 0)),
      Seq((0, 1, 1.0, 6), (1, 2, 1.0, 3)))
    val p = net.prefDijkstra(0, 2, Preference(CostType.DI, Some(3)))
    assert(p.get === Vector(0, 1, 2))
  }

  test("falls back to plain Dijkstra when the slave restriction disconnects d") {
    // 0 -(rt1)- 1 and 0 -(rt6)- 2 : preferring rt1 at vertex 0 hides the
    // only edge to 2; the fallback must still find 2.
    val net = TestNets.custom(Seq((0, 0), (1, 0), (0, 1)),
      Seq((0, 1, 1.0, 1), (0, 2, 1.0, 6)))
    val p = net.prefDijkstra(0, 2, Preference(CostType.DI, Some(1)))
    assert(p === net.dijkstra(0, 2, _.dist))
  }

  test("returned paths are always valid") {
    val grid = TestNets.smallGrid()
    val rnd = new scala.util.Random(7)
    for (_ <- 0 until 10) {
      val s = rnd.nextInt(grid.n); val d = rnd.nextInt(grid.n)
      val pref = Preference(CostType.all(rnd.nextInt(3)),
        if (rnd.nextBoolean()) Some(1 + rnd.nextInt(6)) else None)
      val p = grid.prefDijkstra(s, d, pref)
      assert(p.isDefined)
      assert(p.get.head === s && p.get.last === d)
      assert(grid.isValidPath(p.get))
    }
  }

  test("slave-preferred paths use at least as much preferred road type") {
    val grid = TestNets.smallGrid(16, 16)
    val rnd = new scala.util.Random(11)
    var checked = 0
    for (_ <- 0 until 20) {
      val s = rnd.nextInt(grid.n); val d = rnd.nextInt(grid.n)
      val plain = grid.dijkstra(s, d, _.dist).get
      val pref = grid.prefDijkstra(s, d, Preference(CostType.DI, Some(3))).get
      def rtLen(p: Vector[Int]) = p.sliding(2).collect {
        case Seq(a, b) if grid.edgeBetween(a, b).exists(_.rt == 3) => grid.lenBetween(a, b)
      }.sum
      if (rtLen(pref) >= rtLen(plain) - 1e-9) checked += 1
    }
    assert(checked >= 18, "preference-aware routing should not reduce preferred-type usage in ≥90% of cases")
  }
}
