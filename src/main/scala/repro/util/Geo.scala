package repro.util

/** Planar geometry helpers for the region-size statistics (Table IV):
  * convex hull (Andrew monotone chain), polygon area, and diameter.
  */
object Geo {

  /** Convex hull of a point set, counter-clockwise, no repeated last point. */
  def convexHull(pts: Seq[(Double, Double)]): Seq[(Double, Double)] = {
    val sorted = pts.distinct.sortBy(identity)
    if (sorted.size <= 2) return sorted
    def cross(o: (Double, Double), a: (Double, Double), b: (Double, Double)): Double =
      (a._1 - o._1) * (b._2 - o._2) - (a._2 - o._2) * (b._1 - o._1)
    def half(ps: Seq[(Double, Double)]): Seq[(Double, Double)] = {
      val h = scala.collection.mutable.ArrayBuffer.empty[(Double, Double)]
      ps.foreach { p =>
        while (h.size >= 2 && cross(h(h.size - 2), h(h.size - 1), p) <= 0) h.remove(h.size - 1)
        h += p
      }
      h.toSeq
    }
    val lower = half(sorted)
    val upper = half(sorted.reverse)
    lower.dropRight(1) ++ upper.dropRight(1)
  }

  /** Area of a simple polygon (shoelace), in the square of the input unit. */
  def polygonArea(poly: Seq[(Double, Double)]): Double = {
    if (poly.size < 3) return 0.0
    var s = 0.0
    for (i <- poly.indices) {
      val (x1, y1) = poly(i)
      val (x2, y2) = poly((i + 1) % poly.size)
      s += x1 * y2 - x2 * y1
    }
    math.abs(s) / 2.0
  }

  /** Maximum pairwise distance of a point set (O(h²) on its hull). */
  def diameter(pts: Seq[(Double, Double)]): Double = {
    val h = convexHull(pts)
    if (h.size < 2) 0.0
    else (for (a <- h; b <- h) yield math.hypot(a._1 - b._1, a._2 - b._2)).max
  }
}
