package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core.PreferenceTransfer
import repro.core.PreferenceTransfer.REdgeFeat

/** The Figure 9 experiment: accuracy of preference transfer, evaluated by
  * 5-fold style hold-out over T-edges (the paper's "partitions"). One
  * partition's learned preferences are hidden (treated as B-edges) and
  * predicted from 1, 2, 3 or 4 of the remaining partitions; accuracy is the
  * Jaccard similarity of the predicted vs. ground-truth feature sets.
  */
object TransferEval {

  final case class HoldoutResult(accuracy: Double, nullRate: Double, millis: Long, nnz: Long,
                                 nLabelled: Int, nHeldOut: Int)

  /** Jaccard similarity of two preference feature sets {master, slave}. */
  def prefJaccard(predMaster: Int, predSlave: Int, gtMaster: Int, gtSlave: Int): Double = {
    def set(m: Int, s: Int): Set[Int] = (if (m >= 0) Set(m) else Set.empty[Int]) ++
      (if (s >= 0) Set(100 + s) else Set.empty[Int])
    val a = set(predMaster, predSlave); val b = set(gtMaster, gtSlave)
    val u = (a union b).size
    if (u == 0) 1.0 else (a intersect b).size.toDouble / u
  }

  /** Hold out partition 0 of the T-edge features, label with partitions
    * 1..nPartsUsed, transfer, and score the held-out preferences. T-edges
    * in unused partitions are excluded (the paper scales the training set
    * 1X → 4X).
    */
  def holdout(spark: SparkSession, tFeats: IndexedSeq[REdgeFeat], nPartsUsed: Int,
              amr: Double, mu1: Double = 1.0, mu2: Double = 0.01, nParts: Int = 5,
              seed: Long = 17L): HoldoutResult = {
    require(tFeats.forall(_.isT), "holdout expects learned T-edge features")
    val rnd = new scala.util.Random(seed)
    val part = tFeats.map(_ => rnd.nextInt(nParts))
    val heldOut = tFeats.zip(part).filter(_._2 == 0).map(_._1)
    val labelled = tFeats.zip(part).filter { case (_, p) => p >= 1 && p <= nPartsUsed }.map(_._1)

    // held-out edges participate unlabelled (preference masked)
    val feats = (labelled ++ heldOut.map(f => f.copy(isT = false, masterId = -1, slaveRt = -1))).toIndexedSeq
    val res = PreferenceTransfer.transfer(spark, feats, amr, mu1, mu2)

    val scores = heldOut.zipWithIndex.map { case (gt, k) =>
      val i = labelled.size + k
      val pred = PreferenceTransfer.decode(res.yHat(i))
      pred match {
        case None    => 0.0
        case Some(p) => prefJaccard(p.master.id, p.slave.getOrElse(-1), gt.masterId, gt.slaveRt)
      }
    }
    val acc = if (scores.isEmpty) 0.0 else scores.sum / scores.size
    val nulls = heldOut.zipWithIndex.count { case (_, k) =>
      PreferenceTransfer.decode(res.yHat(labelled.size + k)).isEmpty
    }
    HoldoutResult(acc, if (heldOut.isEmpty) 0.0 else nulls.toDouble / heldOut.size,
      res.solveMillis, res.adjacencyNnz, labelled.size, heldOut.size)
  }
}
