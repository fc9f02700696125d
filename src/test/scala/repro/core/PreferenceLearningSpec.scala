package repro.core

import repro.roadnet.{CostType, Preference}
import repro.{SparkSpec, TestNets}

class PreferenceLearningSpec extends SparkSpec {

  private val grid = TestNets.smallGrid(16, 12)

  /** Plant a preference, route trips with it, and check recovery. */
  private def plantAndLearn(pref: Preference, pairs: Seq[(Int, Int)]): (Preference, Double) = {
    val paths = pairs.flatMap { case (s, d) => grid.prefDijkstra(s, d, pref) }
      .filter(_.length >= 2).map(p => (p: Seq[Int], 1))
    PreferenceLearning.learnOne(grid, paths)
  }

  private val rnd = new scala.util.Random(19)
  private val pairs = Seq.fill(6)((rnd.nextInt(grid.n), rnd.nextInt(grid.n))).filter(p => p._1 != p._2)

  for (master <- CostType.all) {
    test(s"recovers planted master preference ${master.name}") {
      val (learned, sim) = plantAndLearn(Preference(master, None), pairs)
      assert(learned.master === master)
      assert(sim > 0.95, s"self-consistency similarity should be ~1, got $sim")
    }
  }

  test("recovers a planted slave preference (TT + motorway)") {
    val planted = Preference(CostType.TT, Some(1))
    val longPairs = Seq((0, grid.n - 1), (15, grid.n - 3), (2, grid.n - 20))
    val (learned, sim) = plantAndLearn(planted, longPairs)
    assert(learned.master === CostType.TT)
    assert(sim > 0.95)
    // slave is only kept when it strictly improves similarity; if the
    // TT-optimal path already uses motorways the slave may be dropped —
    // both are faithful explanations of the paths.
    if (learned.slave.isDefined) assert(learned.slave === Some(1))
  }

  test("slave feature is learned when it is the only explanation") {
    // plant DI + prefer-residential on pairs where plain-DI differs
    val planted = Preference(CostType.DI, Some(6))
    val cands = Seq.fill(30)((rnd.nextInt(grid.n), rnd.nextInt(grid.n)))
      .filter { case (s, d) => s != d }
      .filter { case (s, d) =>
        grid.prefDijkstra(s, d, planted).get != grid.dijkstra(s, d, _.dist).get
      }.take(5)
    assume(cands.nonEmpty, "need at least one pair where the slave matters")
    val (learned, _) = plantAndLearn(planted, cands)
    assert(learned.slave === Some(6))
  }

  test("empty path set yields the default preference") {
    val (p, sim) = PreferenceLearning.learnOne(grid, Nil)
    assert(p === Preference(CostType.TT, None))
    assert(sim === 0.0)
  }

  test("path weights (trajectory counts) matter") {
    // one DI-consistent path with weight 10 vs one TT-consistent with weight 1
    val s = 0; val d = grid.n - 1
    val di = grid.dijkstra(s, d, _.dist).get
    val tt = grid.dijkstra(s, d, _.tt).get
    assume(di != tt)
    val (p, _) = PreferenceLearning.learnOne(grid, Seq((di: Seq[Int]) -> 10, (tt: Seq[Int]) -> 1))
    assert(p.master === CostType.DI)
  }

  test("learnPerPath yields one preference per path") {
    val ps = pairs.take(3).map { case (s, d) => grid.dijkstra(s, d, _.tt).get: Seq[Int] }
    assert(PreferenceLearning.learnPerPath(grid, ps).size === 3)
  }

  test("distributed learn matches local learnOne") {
    val tedges = pairs.take(3).zipWithIndex.map { case ((s, d), i) =>
      val p = grid.dijkstra(s, d, _.dist).get
      PreferenceLearning.TEdgePaths(i, i + 100, Seq(p), Seq(1))
    }
    val learned = PreferenceLearning.learn(spark, grid, tedges).sortBy(_.ri)
    learned.zip(tedges).foreach { case (lp, te) =>
      val (expect, sim) = PreferenceLearning.learnOne(grid, te.paths.zip(te.counts))
      assert(lp.pref === expect)
      assert(math.abs(lp.avgSim - sim) < 1e-9)
    }
  }

  test("avgSim is in [0,1]") {
    val ps = pairs.take(4).map { case (s, d) => (grid.dijkstra(s, d, _.fc).get: Seq[Int]) -> 2 }
    val (_, sim) = PreferenceLearning.learnOne(grid, ps)
    assert(sim >= 0.0 && sim <= 1.0 + 1e-9)
  }
}
