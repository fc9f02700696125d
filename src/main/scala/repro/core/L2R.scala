package repro.core

import repro.roadnet.RoadNetwork

import scala.collection.mutable

/** The unified routing algorithm of Section VI, answering arbitrary (s, d)
  * requests on the region graph.
  *
  * Case 1 (both endpoints in regions): same region → most-traversed
  * inner-region path (fastest path if none); different regions → a region
  * path that prefers few region edges and geometric progress toward the
  * destination region (direct region edges always win), mapped back to the
  * road network by stitching each region edge's most popular path with
  * short fastest-path connectors.
  *
  * Case 2 (an endpoint outside all regions): a fastest-path search finds the
  * nearest region (forward from s / backward from d); the fastest sub-paths
  * P_s / P_d arise naturally as the stitching connectors. If no region can
  * be reached the fastest path is returned.
  */
final class L2RRouter(net: RoadNetwork, index: RegionGraphIndex) extends Serializable {

  private def fastest(s: Int, d: Int): Vector[Int] =
    net.dijkstra(s, d, _.tt).getOrElse(Vector(s, d))

  /** Remove revisits so the result is a simple path (stitching can touch a
    * vertex twice; loops add nothing for a routing recommendation).
    */
  def removeCycles(path: Vector[Int]): Vector[Int] = {
    val buf = mutable.ArrayBuffer.empty[Int]
    val pos = mutable.HashMap.empty[Int, Int]
    path.foreach { v =>
      pos.get(v) match {
        case Some(i) =>
          while (buf.length > i + 1) { pos.remove(buf.last); buf.remove(buf.length - 1) }
        case None =>
          buf += v; pos(v) = buf.length - 1
      }
    }
    buf.toVector
  }

  /** Region-graph path search: Dijkstra over region edges weighted by
    * centroid distance plus a per-hop constant, so direct edges always beat
    * multi-hop detours (triangle inequality) and fewer region edges are
    * preferred — the paper's routing intuition.
    */
  def regionPath(rs: Int, rd: Int, hopPenaltyKm: Double = 1.0): Option[Seq[Int]] = {
    if (rs == rd) return Some(Seq(rs))
    val dist = mutable.HashMap(rs -> 0.0)
    val parent = mutable.HashMap.empty[Int, Int]
    val done = mutable.Set.empty[Int]
    val pq = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    pq.enqueue((0.0, rs))
    while (pq.nonEmpty) {
      val (c, r) = pq.dequeue()
      if (!done.contains(r)) {
        done += r
        if (r == rd) {
          val b = mutable.ArrayBuffer(rd)
          var cur = rd
          while (cur != rs) { cur = parent(cur); b += cur }
          return Some(b.reverse.toSeq)
        }
        index.neighbors.getOrElse(r, Nil).foreach { nb =>
          val nc = c + index.centroidDist(r, nb) + hopPenaltyKm
          if (nc < dist.getOrElse(nb, Double.PositiveInfinity)) {
            dist(nb) = nc; parent(nb) = r; pq.enqueue((nc, nb))
          }
        }
      }
    }
    None
  }

  /** The representative road path of region edge (a → b): the most popular
    * stored path oriented in travel direction (reversed when only the
    * opposite orientation was recorded — the network is bidirectional).
    */
  def representativePath(a: Int, b: Int): Option[Vector[Int]] =
    index.edgeBetween(a, b).filter(_.paths.nonEmpty).map { e =>
      def orientedTowardB(p: Seq[Int]): Boolean =
        index.vertexRegion.get(p.last).contains(b) || index.vertexRegion.get(p.head).contains(a)
      val best = e.paths.maxBy(pr => (pr.count, orientedTowardB(pr.verts), -pr.verts.length))
      val v = best.verts.toVector
      if (orientedTowardB(v)) v else v.reverse
    }

  /** Same-region routing: the most-traversed inner path containing s before
    * d, else the fastest path.
    */
  def innerRoute(r: Int, s: Int, d: Int): Vector[Int] = {
    val cands = index.innerPaths.getOrElse(r, Nil).flatMap { pr =>
      val is = pr.verts.indexOf(s)
      val id = pr.verts.indexOf(d)
      if (is >= 0 && id > is) Some((pr.count, pr.verts.slice(is, id + 1).toVector)) else None
    }
    if (cands.nonEmpty) cands.maxBy(_._1)._2 else fastest(s, d)
  }

  /** The vertex at which trajectories enter region `b` when coming from
    * region `a`: the endpoint of the region edge's most popular path, else
    * the transfer center (or member) of `b` nearest `a`'s centroid.
    */
  def entryVertex(a: Int, b: Int): Option[Int] =
    representativePath(a, b).map(_.last).orElse {
      index.regions.get(b).map { rb =>
        val ra = index.regions(a)
        val cands = if (rb.transferCenters.nonEmpty) rb.transferCenters else rb.members
        cands.minBy { v =>
          val vv = net.vertices(v)
          (math.hypot(vv.x - ra.cx, vv.y - ra.cy), v)
        }
      }
    }

  /** Map a region path back to a road path (Section VI).
    *
    * A direct region edge routes s → d with that edge's learned or
    * transferred preference (Algorithm 2) — for a T-edge this
    * reconstructs the behaviour of the trajectories that connect the two
    * regions. A multi-edge region path represents one coherent journey,
    * so the preferences of its region edges *vote* (weighted by
    * trajectory support) and the winning preference routes s → d in one
    * go; anchoring on every intermediate region's entry vertex would
    * manufacture detours the trajectories never took. With no preference
    * available anywhere on the path, the fastest path is returned
    * (paper, Section VII-B: null-preference edges get fastest paths).
    */
  private def mapRegionPath(s: Int, d: Int, rp: Seq[Int]): Vector[Int] = {
    // Case 1 of trajectory-based routing: if a stored trajectory fragment
    // along the region path already runs through s and then d, recommend
    // that sub-path directly (most-traversed first).
    val reuse = rp.sliding(2).toSeq.flatMap {
      case Seq(a, b) => index.edgeBetween(a, b).toSeq.flatMap(_.paths)
      case _         => Nil
    }.sortBy(-_.count).iterator.flatMap { pr =>
      val is = pr.verts.indexOf(s); val id = pr.verts.indexOf(d)
      if (is >= 0 && id > is) Some(pr.verts.slice(is, id + 1).toVector) else None
    }.nextOption()
    reuse.foreach(p => return p)

    val votes = rp.sliding(2).toSeq.flatMap {
      case Seq(a, b) =>
        index.edgeBetween(a, b).flatMap(e => e.pref.map { p =>
          (p.master.id, p.slave.getOrElse(-1)) -> math.max(1, e.paths.map(_.count).sum)
        })
      case _ => None
    }
    if (votes.isEmpty) fastest(s, d)
    else {
      val (m, sl) = votes.groupBy(_._1).view.mapValues(_.map(_._2).sum).toSeq
        .maxBy { case ((mm, ss), w) => (w, -mm, -ss) }._1
      val pref = repro.roadnet.Preference(repro.roadnet.CostType.byId(m), if (sl < 0) None else Some(sl))
      removeCycles(net.prefDijkstra(s, d, pref).getOrElse(fastest(s, d)))
    }
  }

  /** Nearest region to s in fastest-path order (forward search). */
  def nearestRegionFrom(s: Int): Option[Int] =
    index.vertexRegion.get(s).orElse(
      net.dijkstraToPredicate(s, v => index.vertexRegion.contains(v), _.tt)
        .map { case (v, _) => index.vertexRegion(v) })

  /** Nearest region to d in fastest-path order (backward search). */
  def nearestRegionTo(d: Int): Option[Int] =
    index.vertexRegion.get(d).orElse(
      net.dijkstraFromPredicateTo(d, v => index.vertexRegion.contains(v), _.tt)
        .map { case (v, _) => index.vertexRegion(v) })

  /** Answer a routing request; always returns a valid path s → d. */
  def route(s: Int, d: Int): Vector[Int] = {
    if (s == d) return Vector(s)
    val rsOpt = index.vertexRegion.get(s)
    val rdOpt = index.vertexRegion.get(d)
    (rsOpt, rdOpt) match {
      case (Some(rs), Some(rd)) if rs == rd =>
        // Case 1, same region: most-traversed inner path
        innerRoute(rs, s, d)
      case (Some(rs), Some(rd)) =>
        // Case 1, different regions: route on the region graph
        regionPath(rs, rd) match {
          case Some(rp) if rp.length >= 2 => mapRegionPath(s, d, rp)
          case _                          => fastest(s, d)
        }
      case _ =>
        // Case 2 (Section VI): find candidate regions *visited by the
        // fastest path* from s to d; with fewer than two candidates the
        // fastest path is returned unchanged (paper, Fig. 8).
        val fp = fastest(s, d)
        val rs = rsOpt.orElse(fp.iterator.flatMap(index.vertexRegion.get).nextOption())
        val rd = rdOpt.orElse(fp.reverseIterator.flatMap(index.vertexRegion.get).nextOption())
        (rs, rd) match {
          case (Some(a), Some(b)) if a != b =>
            regionPath(a, b) match {
              case Some(rp) if rp.length >= 2 => mapRegionPath(s, d, rp)
              case _                          => fp
            }
          case _ => fp
        }
    }
  }
}
