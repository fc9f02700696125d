package repro.roadnet

import scala.collection.mutable

/** Deterministic synthetic road-network generator.
  *
  * Substitutes the paper's OSM extracts (Denmark / Chengdu) with a grid city
  * whose structure carries the properties L2R exploits:
  *
  *  - a road-type hierarchy (1 = motorway … 6 = residential) laid out like a
  *    real arterial grid: every 16th line is a motorway, every 8th a trunk,
  *    every 4th a primary, every 2nd a secondary, the rest tertiary or
  *    residential;
  *  - three weight functions with *different* optima: distance (DI), travel
  *    time (TT, fast on motorways) and fuel (FC, U-shaped in speed with an
  *    optimum near 60 km/h, so FC-optimal paths prefer mid-class roads);
  *  - mild deterministic length jitter so shortest paths are unique in
  *    practice.
  *
  * All randomness is a pure function of (edge coordinates, seed).
  */
object RoadNetGen {

  /** @param cols,rows   grid dimensions (vertices)
    * @param spacingKm   nominal spacing between adjacent intersections
    * @param seed        jitter / road-type salt
    */
  final case class Config(cols: Int = 32, rows: Int = 24, spacingKm: Double = 0.25, seed: Long = 7L)

  /** D1-lite: Denmark-like — wide area, long trips possible. */
  val D1: Config = Config(cols = 96, rows = 72, spacingKm = 1.2, seed = 11L)
  /** D2-lite: Chengdu-like — dense city core (≈ 32×24 km, close to
    * Chengdu's 33×25 km bounding box).
    */
  val D2: Config = Config(cols = 64, rows = 48, spacingKm = 0.5, seed = 13L)

  /** Free-flow speed (km/h) per road type. */
  val speedKmh: Map[Int, Double] =
    Map(1 -> 110.0, 2 -> 90.0, 3 -> 70.0, 4 -> 60.0, 5 -> 50.0, 6 -> 30.0)

  /** Fuel consumption per km as a function of speed: U-shaped with an
    * optimum at 60 km/h (stands in for the vehicular environmental model
    * [37] the paper uses).
    */
  def fcPerKm(speed: Double): Double = 0.04 + (speed - 60.0) * (speed - 60.0) / 40000.0

  /** splitmix64 — cheap stateless hash used for all jitter. */
  def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform double in [0,1) from a hash. */
  def unit(h: Long): Double = (h >>> 11).toDouble / (1L << 53).toDouble

  /** Road-type level of a grid line index: arterial hierarchy. */
  private def level(i: Int, salt: Long): Int =
    if (i % 16 == 0) 1
    else if (i % 8 == 0) 2
    else if (i % 4 == 0) 3
    else if (i % 2 == 0) 4
    else if (unit(mix(salt * 1315423911L + i)) < 0.5) 5
    else 6

  /** Build the grid network; edges are bidirectional (one [[Edge]] per
    * direction with identical weights).
    */
  def grid(cfg: Config): RoadNetwork = {
    val Config(cols, rows, spacing, seed) = cfg
    def vid(r: Int, c: Int): Int = r * cols + c

    val vertices = Array.tabulate(rows * cols) { i =>
      val r = i / cols; val c = i % cols
      // jitter positions slightly so Euclidean geometry is not degenerate
      val jx = (unit(mix(seed + i * 2)) - 0.5) * 0.2 * spacing
      val jy = (unit(mix(seed + i * 2 + 1)) - 0.5) * 0.2 * spacing
      Vertex(i, c * spacing + jx, r * spacing + jy)
    }

    val edges = mutable.ArrayBuffer.empty[Edge]
    def addBoth(u: Int, v: Int, rt: Int): Unit = {
      val len0 = math.hypot(vertices(u).x - vertices(v).x, vertices(u).y - vertices(v).y)
      val len = math.max(0.01, len0 * (1.0 + 0.1 * unit(mix(seed ^ (u.toLong * 1000003L + v)))))
      val v0 = speedKmh(rt)
      val tt = len / v0 * 60.0
      val fc = len * fcPerKm(v0)
      edges += Edge(u, v, len, tt, fc, rt)
      edges += Edge(v, u, len, tt, fc, rt)
    }

    for (r <- 0 until rows; c <- 0 until cols) {
      if (c + 1 < cols) addBoth(vid(r, c), vid(r, c + 1), level(r, seed))
      if (r + 1 < rows) addBoth(vid(r, c), vid(r + 1, c), level(c, seed + 1))
    }
    new RoadNetwork(vertices, edges.toArray)
  }
}
