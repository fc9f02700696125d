package repro.core

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.roadnet.{CostType, Preference}
import repro.util.LinAlg

import scala.collection.mutable

/** Step 2 of Section V: transfer routing preferences from T-edges to
  * similar B-edges by graph-based transduction.
  *
  * A region edge re is described by re.dis (centroid distance of its two
  * regions) and re.𝔽 (Cartesian product of the two regions' top-k road-type
  * sets). Similarity
  *
  *   reSim(re_i, re_j) = ½ · ( min(dis)/max(dis) + J(𝔽_i, 𝔽_j) )
  *
  * (normalised to [0,1]; the paper sweeps amr over 0.5–0.9 which implies a
  * normalised score — see DESIGN.md). The adjacency matrix M keeps entries
  * ≥ amr; the transferred labels Ŷ solve (S + μ₁L + μ₂I)Ŷ·ₓ = SY·ₓ with
  * L = D − M (Eq. 3), one conjugate-gradient solve per feature column.
  *
  * Pairwise similarity is computed as a distributed crossJoin; the sparse
  * solve itself is driver-side (n = #region edges is small).
  */
object PreferenceTransfer {

  /** Feature description of one region edge. masterId/slaveRt carry the
    * learned preference for T-edges (isT), and are ignored for B-edges.
    * `fpairs` is re.𝔽 encoded as unordered road-type pairs (min*10+max).
    */
  final case class REdgeFeat(ri: Int, rj: Int, isT: Boolean, dis: Double,
                             fpairs: Seq[Int], masterId: Int, slaveRt: Int) {
    def key: (Int, Int) = if (ri < rj) (ri, rj) else (rj, ri)
  }

  /** Encode the Cartesian product of two top-k road-type sets. */
  def fPairs(rtsA: Seq[Int], rtsB: Seq[Int]): Seq[Int] =
    (for (a <- rtsA; b <- rtsB) yield { val lo = math.min(a, b); val hi = math.max(a, b); lo * 10 + hi })
      .distinct.sorted

  /** Region-edge similarity, in [0, 1]. */
  def reSim(disA: Double, fA: Seq[Int], disB: Double, fB: Seq[Int]): Double = {
    val lo = math.min(disA, disB); val hi = math.max(disA, disB)
    val dSim = if (hi <= 0) 1.0 else lo / hi
    val sa = fA.toSet; val sb = fB.toSet
    val union = (sa union sb).size
    val jSim = if (union == 0) 0.0 else (sa intersect sb).size.toDouble / union
    0.5 * (dSim + jSim)
  }

  /** Number of feature columns: 3 master (DI/TT/FC) + 6 slave road types. */
  val P: Int = 9

  final case class TransferResult(
      /** region-edge key → transferred preference (None = null preference) */
      prefs: Map[(Int, Int), Option[Preference]],
      /** raw Ŷ rows, aligned with the input order, for held-out evaluation */
      yHat: Array[Array[Double]],
      nullRate: Double,
      adjacencyNnz: Long,
      solveMillis: Long)

  /** Pairwise similarities ≥ amr over all region edges: the O(n²) sweep is
    * distributed by row (each task scans one strip of the broadcast
    * feature table), which is far cheaper than a Catalyst crossJoin with a
    * per-pair UDF at this density.
    */
  def adjacency(spark: SparkSession, feats: IndexedSeq[REdgeFeat], amr: Double): Seq[(Int, Int, Double)] = {
    import spark.implicits._
    val n = feats.length
    if (n <= 1) return Nil
    val compact = feats.map(f => (f.dis, f.fpairs.toArray))
    val bc = spark.sparkContext.broadcast(compact)
    spark.range(0, n.toLong)
      .as[Long]
      .repartition(math.max(1, math.min(n / 4 + 1, spark.sparkContext.defaultParallelism * 2)))
      .flatMap { i0 =>
        val fs = bc.value
        val i = i0.toInt
        val (da, fa) = fs(i)
        val faSeq = fa.toSeq
        ((i + 1) until fs.length).iterator.flatMap { j =>
          val (db, fb) = fs(j)
          val s = reSim(da, faSeq, db, fb.toSeq)
          if (s >= amr) Some((i, j, s)) else None
        }
      }
      .collect()
      .toSeq
  }

  /** Decode one Ŷ row into a preference: master = argmax over cost columns
    * (null when the row is ~0, i.e. the edge is disconnected from every
    * labelled edge); slave = argmax over road-type columns, kept only when
    * its score is a substantial fraction of the master score.
    */
  def decode(row: Array[Double], slaveFraction: Double = 0.25): Option[Preference] = {
    val masterId = (0 until 3).maxBy(row(_))
    if (row(masterId) < 1e-8) None
    else {
      val slaveCol = (3 until P).maxBy(row(_))
      val slave = if (row(slaveCol) >= slaveFraction * row(masterId)) Some(slaveCol - 2) else None
      Some(Preference(CostType.byId(masterId), slave))
    }
  }

  /** Run the transduction. T-edge rows of Y are one-hot in their learned
    * features; B-edge rows start at zero (unlabelled).
    */
  def transfer(spark: SparkSession, feats: IndexedSeq[REdgeFeat],
               amr: Double = 0.7, mu1: Double = 1.0, mu2: Double = 0.01,
               slaveFraction: Double = 0.25): TransferResult = {
    val n = feats.length
    val entries = adjacency(spark, feats, amr)
    val t0 = System.nanoTime()

    // CSR-ish structure for A = S + μ₁(D − M) + μ₂I
    val deg = new Array[Double](n)
    val rows = Array.fill(n)(mutable.ArrayBuffer.empty[(Int, Double)])
    entries.foreach { case (i, j, s) =>
      deg(i) += s; deg(j) += s
      rows(i) += ((j, s)); rows(j) += ((i, s))
    }
    val sDiag = feats.map(f => if (f.isT) 1.0 else 0.0).toArray
    val diag = Array.tabulate(n)(i => sDiag(i) + mu1 * deg(i) + mu2)
    val rowArr = rows.map(_.toArray)

    def matvec(x: Array[Double]): Array[Double] = {
      val out = new Array[Double](n)
      var i = 0
      while (i < n) {
        var s = diag(i) * x(i)
        val r = rowArr(i)
        var k = 0
        while (k < r.length) { s -= mu1 * r(k)._2 * x(r(k)._1); k += 1 }
        out(i) = s
        i += 1
      }
      out
    }

    // Y columns (only T-edge rows are non-zero); solve p systems
    val yHat = Array.fill(n)(new Array[Double](P))
    for (x <- 0 until P) {
      val b = new Array[Double](n)
      feats.zipWithIndex.foreach { case (f, i) =>
        if (f.isT) {
          val hot = (x < 3 && f.masterId == x) || (x >= 3 && f.slaveRt == x - 2)
          if (hot) b(i) = 1.0 // S·Y with S[i,i]=1 for T-edges
        }
      }
      if (b.exists(_ != 0.0)) {
        val sol = LinAlg.cg(matvec, b)
        var i = 0
        while (i < n) { yHat(i)(x) = sol(i); i += 1 }
      }
    }
    val solveMillis = (System.nanoTime() - t0) / 1000000

    val prefs = feats.zipWithIndex.map { case (f, i) =>
      f.key -> (if (f.isT) Some(Preference(CostType.byId(f.masterId),
                                           if (f.slaveRt < 0) None else Some(f.slaveRt)))
                else decode(yHat(i), slaveFraction))
    }.toMap
    val bRows = feats.zipWithIndex.filterNot(_._1.isT)
    val nulls = bRows.count { case (f, i) => decode(yHat(i), slaveFraction).isEmpty }
    val nullRate = if (bRows.isEmpty) 0.0 else nulls.toDouble / bRows.size
    TransferResult(prefs, yHat, nullRate, entries.size.toLong, solveMillis)
  }

  /** Build region-edge features from a region graph and the learned T-edge
    * preferences.
    */
  def features(index: RegionGraphIndex,
               learned: Map[(Int, Int), PreferenceLearning.LearnedPref]): IndexedSeq[REdgeFeat] = {
    // T-edges first (the paper's convention for S)
    val all = index.edges.values.toIndexedSeq.sortBy(e => (!e.isT, e.ri, e.rj))
    all.map { e =>
      val a = index.regions(e.ri); val b = index.regions(e.rj)
      val dis = math.hypot(a.cx - b.cx, a.cy - b.cy)
      val fp = fPairs(a.topRts, b.topRts)
      learned.get(e.key) match {
        case Some(lp) if e.isT => REdgeFeat(e.ri, e.rj, isT = true, dis, fp, lp.masterId, lp.slaveRt)
        case _                 => REdgeFeat(e.ri, e.rj, isT = false, dis, fp, -1, -1)
      }
    }
  }
}
