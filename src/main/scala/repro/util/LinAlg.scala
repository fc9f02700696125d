package repro.util

/** Small dependency-free linear algebra: a conjugate-gradient solver for the
  * sparse SPD transduction system (S + μ₁L + μ₂I)x = b, plus a dense
  * Gaussian-elimination solver used as a test oracle.
  */
object LinAlg {

  /** Solve A x = b by conjugate gradient, where A is given as a matvec.
    * A must be symmetric positive definite.
    */
  def cg(matvec: Array[Double] => Array[Double], b: Array[Double],
         tol: Double = 1e-10, maxIter: Int = 2000): Array[Double] = {
    val n = b.length
    val x = new Array[Double](n)
    val r = b.clone()
    val p = b.clone()
    var rs = r.map(v => v * v).sum
    val b2 = math.max(rs, 1e-300)
    var it = 0
    while (it < maxIter && rs / b2 > tol * tol) {
      val ap = matvec(p)
      val pap = (0 until n).iterator.map(i => p(i) * ap(i)).sum
      if (math.abs(pap) < 1e-300) return x
      val alpha = rs / pap
      var i = 0
      while (i < n) { x(i) += alpha * p(i); r(i) -= alpha * ap(i); i += 1 }
      val rs2 = r.map(v => v * v).sum
      val beta = rs2 / rs
      i = 0
      while (i < n) { p(i) = r(i) + beta * p(i); i += 1 }
      rs = rs2
      it += 1
    }
    x
  }

  /** Dense solve by Gaussian elimination with partial pivoting (test oracle;
    * mutates copies only).
    */
  def solveDense(a0: Array[Array[Double]], b0: Array[Double]): Array[Double] = {
    val n = b0.length
    val a = a0.map(_.clone())
    val b = b0.clone()
    for (col <- 0 until n) {
      var piv = col
      for (r <- col + 1 until n) if (math.abs(a(r)(col)) > math.abs(a(piv)(col))) piv = r
      val tmp = a(col); a(col) = a(piv); a(piv) = tmp
      val tb = b(col); b(col) = b(piv); b(piv) = tb
      require(math.abs(a(col)(col)) > 1e-12, s"singular matrix at column $col")
      for (r <- col + 1 until n) {
        val f = a(r)(col) / a(col)(col)
        if (f != 0.0) {
          for (c <- col until n) a(r)(c) -= f * a(col)(c)
          b(r) -= f * b(col)
        }
      }
    }
    val x = new Array[Double](n)
    for (r <- (n - 1) to 0 by -1) {
      var s = b(r)
      for (c <- r + 1 until n) s -= a(r)(c) * x(c)
      x(r) = s / a(r)(r)
    }
    x
  }
}
