package repro.roadnet

import scala.collection.mutable

/** A travel-cost feature a driver may minimise — the "master" dimension of a
  * routing preference (Section V-A of the paper).
  */
sealed trait CostType extends Serializable {
  /** Stable column index in the preference feature space (0..2). */
  def id: Int
  /** The cost of one edge under this feature. */
  def of(e: Edge): Double
  def name: String
}

object CostType {
  /** Distance. */
  case object DI extends CostType { val id = 0; def of(e: Edge): Double = e.dist; val name = "DI" }
  /** Travel time. */
  case object TT extends CostType { val id = 1; def of(e: Edge): Double = e.tt;   val name = "TT" }
  /** Fuel consumption. */
  case object FC extends CostType { val id = 2; def of(e: Edge): Double = e.fc;   val name = "FC" }

  val all: Seq[CostType] = Seq(DI, TT, FC)

  def byId(i: Int): CostType = all(i)
}

/** A road intersection with planar coordinates in kilometres. */
final case class Vertex(id: Int, x: Double, y: Double)

/** A directed road segment.
  *
  * @param dist length in km
  * @param tt   travel time in minutes
  * @param fc   fuel consumption in litres
  * @param rt   OSM-style road type, 1 = motorway … 6 = residential
  */
final case class Edge(src: Int, dst: Int, dist: Double, tt: Double, fc: Double, rt: Int)

/** A routing preference vector ⟨master, slave⟩ (Section V-A): minimise the
  * master cost feature while preferring edges whose road type matches the
  * optional slave feature.
  */
final case class Preference(master: CostType, slave: Option[Int]) {
  override def toString: String = s"⟨${master.name}, ${slave.map("TP" + _).getOrElse("-")}⟩"
}

/** In-memory road network 𝒢 = (𝕍, 𝔼, 𝕎) with adjacency indexes and the
  * search kernels every stage of the pipeline relies on: plain Dijkstra,
  * the paper's preference-aware Dijkstra (Algorithm 2), predicate searches
  * (used by routing Case 2), and BFS (used for B-edge construction).
  *
  * The network is broadcast to executors for the distributed fan-out
  * stages, hence [[Serializable]]. Vertex ids must be 0..n-1.
  */
final class RoadNetwork(val vertices: Array[Vertex], val edges: Array[Edge]) extends Serializable {

  val n: Int = vertices.length

  /** Outgoing edge indices per vertex. */
  val adj: Array[Array[Int]] = {
    val buf = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    edges.zipWithIndex.foreach { case (e, i) => buf(e.src) += i }
    buf.map(_.toArray)
  }

  /** Incoming edge indices per vertex (for backward searches from d). */
  val radj: Array[Array[Int]] = {
    val buf = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    edges.zipWithIndex.foreach { case (e, i) => buf(e.dst) += i }
    buf.map(_.toArray)
  }

  private val edgeIdx: java.util.HashMap[Long, Int] = {
    val m = new java.util.HashMap[Long, Int](edges.length * 2)
    edges.zipWithIndex.foreach { case (e, i) => m.put(e.src.toLong << 32 | (e.dst.toLong & 0xffffffffL), i) }
    m
  }

  /** The edge from u to v, if any. */
  def edgeBetween(u: Int, v: Int): Option[Edge] = {
    val i = edgeIdx.getOrDefault(u.toLong << 32 | (v.toLong & 0xffffffffL), -1)
    if (i < 0) None else Some(edges(i))
  }

  /** Length (km) of the undirected road between u and v; 0 if absent. */
  def lenBetween(u: Int, v: Int): Double =
    edgeBetween(u, v).orElse(edgeBetween(v, u)).map(_.dist).getOrElse(0.0)

  /** Euclidean distance between two vertices in km. */
  def euclid(u: Int, v: Int): Double = {
    val a = vertices(u); val b = vertices(v)
    math.hypot(a.x - b.x, a.y - b.y)
  }

  /** Sum of `cost` over the consecutive edges of `path`; +inf if a hop is
    * not an edge of the network (so tests catch invalid paths).
    */
  def pathCost(path: IndexedSeq[Int], cost: Edge => Double): Double = {
    var s = 0.0
    var i = 0
    while (i + 1 < path.length) {
      edgeBetween(path(i), path(i + 1)) match {
        case Some(e) => s += cost(e)
        case None    => return Double.PositiveInfinity
      }
      i += 1
    }
    s
  }

  /** Path length in km. */
  def pathLength(path: IndexedSeq[Int]): Double = pathCost(path, _.dist)

  /** True iff every consecutive vertex pair is connected by an edge. */
  def isValidPath(path: IndexedSeq[Int]): Boolean =
    path.nonEmpty && path.sliding(2).forall {
      case Seq(a, b) => edgeBetween(a, b).isDefined
      case _         => true
    }

  // ---------------------------------------------------------------- searches

  private final class MinPQ {
    // Binary-heap PQ of (cost, vertex) with lazy deletion.
    private val q = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    def push(c: Double, v: Int): Unit = q.enqueue((c, v))
    def pop(): (Double, Int) = q.dequeue()
    def nonEmpty: Boolean = q.nonEmpty
  }

  private def reconstruct(parent: Array[Int], src: Int, dst: Int): Vector[Int] = {
    val b = mutable.ArrayBuffer[Int](dst)
    var v = dst
    while (v != src) { v = parent(v); b += v }
    b.reverseIterator.toVector
  }

  /** Single-source single-target Dijkstra under an arbitrary edge cost.
    * Returns the optimal path (inclusive of endpoints), or None if
    * unreachable. `src == dst` yields the trivial one-vertex path.
    */
  def dijkstra(src: Int, dst: Int, cost: Edge => Double): Option[Vector[Int]] =
    dijkstraToPredicate(src, _ == dst, cost).map(_._2)

  /** Forward Dijkstra that stops at the first settled vertex satisfying
    * `pred`; returns (foundVertex, path src→foundVertex).
    */
  def dijkstraToPredicate(src: Int, pred: Int => Boolean, cost: Edge => Double): Option[(Int, Vector[Int])] = {
    val dist = Array.fill(n)(Double.PositiveInfinity)
    val parent = Array.fill(n)(-1)
    val done = new Array[Boolean](n)
    val pq = new MinPQ
    dist(src) = 0.0; pq.push(0.0, src)
    while (pq.nonEmpty) {
      val (c, u) = pq.pop()
      if (!done(u)) {
        done(u) = true
        if (pred(u)) return Some((u, reconstruct(parent, src, u)))
        var i = 0
        while (i < adj(u).length) {
          val e = edges(adj(u)(i))
          val nc = c + cost(e)
          if (nc < dist(e.dst)) { dist(e.dst) = nc; parent(e.dst) = u; pq.push(nc, e.dst) }
          i += 1
        }
      }
    }
    None
  }

  /** Backward Dijkstra from `dst` over incoming edges, stopping at the first
    * settled vertex satisfying `pred`; returns (foundVertex, path
    * foundVertex→dst) — i.e. the path already runs in travel direction.
    */
  def dijkstraFromPredicateTo(dst: Int, pred: Int => Boolean, cost: Edge => Double): Option[(Int, Vector[Int])] = {
    val dist = Array.fill(n)(Double.PositiveInfinity)
    val child = Array.fill(n)(-1) // next hop toward dst
    val done = new Array[Boolean](n)
    val pq = new MinPQ
    dist(dst) = 0.0; pq.push(0.0, dst)
    while (pq.nonEmpty) {
      val (c, u) = pq.pop()
      if (!done(u)) {
        done(u) = true
        if (pred(u)) {
          val b = mutable.ArrayBuffer[Int](u)
          var v = u
          while (v != dst) { v = child(v); b += v }
          return Some((u, b.toVector))
        }
        var i = 0
        while (i < radj(u).length) {
          val e = edges(radj(u)(i))
          val nc = c + cost(e)
          if (nc < dist(e.src)) { dist(e.src) = nc; child(e.src) = u; pq.push(nc, e.src) }
          i += 1
        }
      }
    }
    None
  }

  /** The paper's Algorithm 2: Dijkstra under the master cost where, when a
    * vertex has at least one outgoing edge whose road type satisfies the
    * slave feature, only those edges are explored; otherwise all edges are.
    *
    * The restriction can disconnect the destination in rare topologies, so
    * we fall back to the plain master-cost Dijkstra in that case (the paper
    * does not discuss it; the fallback keeps routing total).
    */
  def prefDijkstra(src: Int, dst: Int, pref: Preference): Option[Vector[Int]] = pref.slave match {
    case None => dijkstra(src, dst, pref.master.of)
    case Some(rt) =>
      val cost: Edge => Double = pref.master.of
      val dist = Array.fill(n)(Double.PositiveInfinity)
      val parent = Array.fill(n)(-1)
      val done = new Array[Boolean](n)
      val pq = new MinPQ
      dist(src) = 0.0; pq.push(0.0, src)
      var found = false
      while (pq.nonEmpty && !found) {
        val (c, u) = pq.pop()
        if (!done(u)) {
          done(u) = true
          if (u == dst) found = true
          else {
            val out = adj(u)
            var anySat = false
            var i = 0
            while (i < out.length && !anySat) { if (edges(out(i)).rt == rt) anySat = true; i += 1 }
            i = 0
            while (i < out.length) {
              val e = edges(out(i))
              if (!anySat || e.rt == rt) {
                val nc = c + cost(e)
                if (nc < dist(e.dst)) { dist(e.dst) = nc; parent(e.dst) = u; pq.push(nc, e.dst) }
              }
              i += 1
            }
          }
        }
      }
      if (found) Some(reconstruct(parent, src, dst))
      else dijkstra(src, dst, cost)
  }

  /** Multi-source BFS over the undirected topology starting from `sources`,
    * where expansion stops at (but records) any vertex for which `stopAt`
    * holds. Returns the set of stop vertices reached. Used by the B-edge
    * construction: start from a region's members, stop at other regions.
    */
  def bfsUntil(sources: Iterable[Int], stopAt: Int => Boolean): Set[Int] = {
    val seen = new Array[Boolean](n)
    val stops = mutable.Set.empty[Int]
    val queue = mutable.Queue.empty[Int]
    sources.foreach { s => if (!seen(s)) { seen(s) = true; queue.enqueue(s) } }
    while (queue.nonEmpty) {
      val u = queue.dequeue()
      val neigh = adj(u).map(edges(_).dst) ++ radj(u).map(edges(_).src)
      neigh.foreach { v =>
        if (!seen(v)) {
          seen(v) = true
          if (stopAt(v)) stops += v
          else queue.enqueue(v)
        }
      }
    }
    stops.toSet
  }

  /** Vertices reachable from `src` over the undirected topology. */
  def reachableFrom(src: Int): Set[Int] = {
    val seen = new Array[Boolean](n)
    val queue = mutable.Queue(src)
    seen(src) = true
    val out = mutable.Set(src)
    while (queue.nonEmpty) {
      val u = queue.dequeue()
      (adj(u).map(edges(_).dst) ++ radj(u).map(edges(_).src)).foreach { v =>
        if (!seen(v)) { seen(v) = true; out += v; queue.enqueue(v) }
      }
    }
    out.toSet
  }
}
