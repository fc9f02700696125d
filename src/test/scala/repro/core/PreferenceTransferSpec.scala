package repro.core

import repro.SparkSpec
import repro.core.PreferenceTransfer._
import repro.roadnet.CostType
import repro.util.LinAlg

class PreferenceTransferSpec extends SparkSpec {

  // ------------------------------------------------------------ reSim

  test("reSim of identical features is 1") {
    assert(reSim(5.0, Seq(13, 14), 5.0, Seq(13, 14)) === 1.0)
  }

  test("reSim is symmetric") {
    assert(reSim(2.0, Seq(13), 8.0, Seq(14, 15)) === reSim(8.0, Seq(14, 15), 2.0, Seq(13)))
  }

  test("reSim is in [0,1]") {
    val rnd = new scala.util.Random(4)
    for (_ <- 0 until 50) {
      val s = reSim(rnd.nextDouble() * 10 + 0.1, Seq(rnd.nextInt(60)),
                    rnd.nextDouble() * 10 + 0.1, Seq(rnd.nextInt(60)))
      assert(s >= 0.0 && s <= 1.0)
    }
  }

  test("reSim distance term is min/max") {
    // disjoint feature sets → Jaccard 0; distance ratio 2/8
    assert(math.abs(reSim(2.0, Seq(11), 8.0, Seq(22)) - 0.5 * 0.25) < 1e-12)
  }

  test("reSim Jaccard term on overlapping feature sets") {
    // same distance → ratio 1; J({11,12},{12,13}) = 1/3
    assert(math.abs(reSim(3.0, Seq(11, 12), 3.0, Seq(12, 13)) - 0.5 * (1 + 1.0 / 3)) < 1e-12)
  }

  test("fPairs builds the unordered Cartesian product") {
    // {1,2} × {3,4} → {13,14,23,24}
    assert(fPairs(Seq(1, 2), Seq(3, 4)) === Seq(13, 14, 23, 24))
    // unordered: {3} × {1} → min*10+max = 13
    assert(fPairs(Seq(3), Seq(1)) === Seq(13))
  }

  test("fPairs deduplicates") {
    assert(fPairs(Seq(1, 1), Seq(2)) === Seq(12))
  }

  // ------------------------------------------------------------ adjacency

  private def feat(i: Int, isT: Boolean, dis: Double, fp: Seq[Int],
                   m: Int = -1, s: Int = -1): REdgeFeat =
    REdgeFeat(i, i + 1000, isT, dis, fp, m, s)

  test("adjacency keeps only pairs with similarity ≥ amr") {
    val feats = IndexedSeq(
      feat(0, isT = true, 5.0, Seq(13)),
      feat(1, isT = true, 5.0, Seq(13)), // sim to 0: 1.0
      feat(2, isT = false, 50.0, Seq(46))) // dissimilar to both
    val entries = adjacency(spark, feats, amr = 0.7)
    assert(entries.map(e => (e._1, e._2)).toSet === Set((0, 1)))
    assert(math.abs(entries.head._3 - 1.0) < 1e-12)
  }

  test("a lower amr admits more adjacency entries") {
    val rnd = new scala.util.Random(8)
    val feats = IndexedSeq.tabulate(12)(i =>
      feat(i, isT = i < 6, 1.0 + rnd.nextDouble() * 9, Seq(11 + rnd.nextInt(4), 33 + rnd.nextInt(3))))
    val hi = adjacency(spark, feats, 0.8).size
    val lo = adjacency(spark, feats, 0.4).size
    assert(lo >= hi)
  }

  // ------------------------------------------------------------ transfer

  test("the Figure-7 shape: B-edges inherit the most similar T-edge's preference") {
    // re1 (T, ⟨DI,TP1⟩) very similar to re3 (B); re2 (T, ⟨TT,TP2⟩) very
    // similar to re4 (B); cross similarities below amr.
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 4.0, Seq(11), CostType.DI.id, 1),
      REdgeFeat(3, 4, isT = true, 20.0, Seq(22), CostType.TT.id, 2),
      REdgeFeat(5, 6, isT = false, 4.2, Seq(11), -1, -1),
      REdgeFeat(7, 8, isT = false, 21.0, Seq(22), -1, -1))
    val res = transfer(spark, feats, amr = 0.7, mu1 = 1.0, mu2 = 0.01)
    val p3 = res.prefs((5, 6)).get
    val p4 = res.prefs((7, 8)).get
    assert(p3.master === CostType.DI && p3.slave === Some(1))
    assert(p4.master === CostType.TT && p4.slave === Some(2))
    assert(res.nullRate === 0.0)
  }

  test("T-edges keep their learned preferences after transfer") {
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 4.0, Seq(11), CostType.FC.id, -1),
      REdgeFeat(5, 6, isT = false, 4.0, Seq(11), -1, -1))
    val res = transfer(spark, feats, 0.7)
    val kept = res.prefs((1, 2)).get
    assert(kept.master === CostType.FC && kept.slave === None)
  }

  test("disconnected B-edges get a null preference") {
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 1.0, Seq(11), CostType.DI.id, -1),
      REdgeFeat(5, 6, isT = false, 500.0, Seq(66), -1, -1)) // similarity ≈ 0
    val res = transfer(spark, feats, amr = 0.7)
    assert(res.prefs((5, 6)) === None)
    assert(res.nullRate === 1.0)
  }

  test("no-slave T-edges transfer no slave") {
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 4.0, Seq(11), CostType.TT.id, -1),
      REdgeFeat(5, 6, isT = false, 4.0, Seq(11), -1, -1))
    val res = transfer(spark, feats, 0.7)
    assert(res.prefs((5, 6)).get.slave === None)
  }

  test("yHat probabilities are higher for more similar edges") {
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 4.0, Seq(11), CostType.DI.id, -1),
      REdgeFeat(5, 6, isT = false, 4.0, Seq(11), -1, -1),   // sim 1.0
      REdgeFeat(7, 8, isT = false, 5.5, Seq(11), -1, -1))   // sim < 1
    val res = transfer(spark, feats, amr = 0.5)
    assert(res.yHat(1)(CostType.DI.id) > res.yHat(2)(CostType.DI.id))
  }

  test("decode: null on an all-zero row") {
    assert(decode(Array.fill(P)(0.0)) === None)
  }

  test("decode: master argmax and slave thresholding") {
    val row = Array(0.1, 0.8, 0.05, 0.0, 0.5, 0.0, 0.0, 0.0, 0.0)
    val p = decode(row).get
    assert(p.master === CostType.TT)
    assert(p.slave === Some(2)) // column 4 → rt 2, 0.5 ≥ 0.25·0.8
    val weakSlave = decode(Array(0.1, 0.8, 0.05, 0.0, 0.1, 0.0, 0.0, 0.0, 0.0)).get
    assert(weakSlave.slave === None)
  }

  // ------------------------------------------------------------ the solver

  test("transfer solves Eq.3: (S + μ1·L + μ2·I)·Ŷ = S·Y (dense-oracle check)") {
    val feats = IndexedSeq(
      REdgeFeat(1, 2, isT = true, 4.0, Seq(11, 12), CostType.DI.id, 1),
      REdgeFeat(3, 4, isT = true, 5.0, Seq(11, 13), CostType.TT.id, -1),
      REdgeFeat(5, 6, isT = false, 4.4, Seq(11, 12), -1, -1),
      REdgeFeat(7, 8, isT = false, 5.2, Seq(11, 13), -1, -1))
    val amr = 0.3; val mu1 = 1.0; val mu2 = 0.01
    val res = transfer(spark, feats, amr, mu1, mu2)
    // rebuild A densely and solve with Gaussian elimination
    val n = feats.length
    val entries = adjacency(spark, feats, amr)
    val m = Array.fill(n, n)(0.0)
    entries.foreach { case (i, j, s) => m(i)(j) = s; m(j)(i) = s }
    val a = Array.tabulate(n, n) { (i, j) =>
      val sDiag = if (feats(i).isT) 1.0 else 0.0
      val deg = m(i).sum
      val lij = (if (i == j) deg else 0.0) - m(i)(j)
      (if (i == j) sDiag + mu2 else 0.0) + mu1 * lij
    }
    for (x <- 0 until P) {
      val b = Array.tabulate(n) { i =>
        if (feats(i).isT && ((x < 3 && feats(i).masterId == x) || (x >= 3 && feats(i).slaveRt == x - 2))) 1.0 else 0.0
      }
      if (b.exists(_ != 0)) {
        val expect = LinAlg.solveDense(a, b)
        for (i <- 0 until n)
          assert(math.abs(res.yHat(i)(x) - expect(i)) < 1e-6,
            s"column $x row $i: cg=${res.yHat(i)(x)} dense=${expect(i)}")
      }
    }
  }
}
