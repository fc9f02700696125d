package repro.roadnet

import repro.{SparkSpec, TestNets}

class RoadNetworkSpec extends SparkSpec {

  private val line = TestNets.line(5)
  private val grid = TestNets.smallGrid()

  test("adjacency lists cover every edge exactly once") {
    assert(grid.adj.map(_.length).sum === grid.edges.length)
    assert(grid.radj.map(_.length).sum === grid.edges.length)
  }

  test("edgeBetween finds forward edges") {
    assert(line.edgeBetween(0, 1).isDefined)
    assert(line.edgeBetween(1, 0).isDefined)
    assert(line.edgeBetween(0, 2).isEmpty)
  }

  test("lenBetween is symmetric") {
    assert(grid.edges.take(50).forall(e => grid.lenBetween(e.src, e.dst) === grid.lenBetween(e.dst, e.src)))
  }

  test("pathCost sums edge costs") {
    assert(math.abs(line.pathCost(Vector(0, 1, 2, 3), _.dist) - 3.0) < 1e-9)
  }

  test("pathCost of an invalid hop is +inf") {
    assert(line.pathCost(Vector(0, 2), _.dist).isPosInfinity)
  }

  test("isValidPath accepts real paths and rejects teleports") {
    assert(line.isValidPath(Vector(0, 1, 2)))
    assert(!line.isValidPath(Vector(0, 2)))
    assert(!line.isValidPath(Vector.empty))
  }

  test("dijkstra on a line returns the line") {
    assert(line.dijkstra(0, 4, _.dist).get === Vector(0, 1, 2, 3, 4))
  }

  test("dijkstra src==dst returns the trivial path") {
    assert(line.dijkstra(2, 2, _.dist).get === Vector(2))
  }

  test("dijkstra returns None when disconnected") {
    val net = TestNets.custom(Seq((0, 0), (1, 0), (5, 5), (6, 5)),
      Seq((0, 1, 1.0, 6), (2, 3, 1.0, 6)))
    assert(net.dijkstra(0, 3, _.dist).isEmpty)
  }

  // Dijkstra vs Bellman-Ford oracle on the grid, for each cost type
  for (c <- CostType.all; k <- 0 until 5) {
    test(s"dijkstra matches Bellman-Ford oracle (cost=${c.name}, case $k)") {
      val rnd = new scala.util.Random(100 + k)
      val s = rnd.nextInt(grid.n); val d = rnd.nextInt(grid.n)
      val p = grid.dijkstra(s, d, c.of)
      val expect = TestNets.bellmanFordCost(grid, s, d, c.of)
      assert(p.isDefined)
      assert(math.abs(grid.pathCost(p.get, c.of) - expect) < 1e-9)
      assert(p.get.head === s && p.get.last === d)
      assert(grid.isValidPath(p.get))
    }
  }

  test("dijkstraToPredicate stops at the nearest matching vertex") {
    val targets = Set(3, 4)
    val (found, path) = line.dijkstraToPredicate(0, targets, _.dist).get
    assert(found === 3)
    assert(path === Vector(0, 1, 2, 3))
  }

  test("dijkstraFromPredicateTo returns a forward-direction path") {
    val (found, path) = line.dijkstraFromPredicateTo(4, Set(1, 0), _.dist).get
    assert(found === 1)
    assert(path === Vector(1, 2, 3, 4))
    assert(line.isValidPath(path))
  }

  test("bfsUntil stops at (and reports) stop vertices without passing them") {
    // 0-1-2-3-4 ; stop at 2 → 3,4 unreachable
    val stops = line.bfsUntil(Seq(0), v => v == 2)
    assert(stops === Set(2))
    val stops2 = line.bfsUntil(Seq(0), v => v == 4)
    assert(stops2 === Set(4))
  }

  test("reachableFrom covers the whole connected grid") {
    assert(grid.reachableFrom(0).size === grid.n)
  }

  test("euclid is a metric on vertex positions") {
    assert(grid.euclid(0, 0) === 0.0)
    assert(grid.euclid(0, 5) === grid.euclid(5, 0))
  }
}
