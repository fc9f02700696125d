package repro.util

import repro.SparkSpec

class LinAlgSpec extends SparkSpec {

  private def dense(a: Array[Array[Double]])(x: Array[Double]): Array[Double] =
    a.map(row => row.zip(x).map { case (v, xi) => v * xi }.sum)

  test("cg solves the identity system") {
    val b = Array(1.0, 2.0, 3.0)
    val x = LinAlg.cg(v => v, b)
    assert(b.zip(x).forall { case (bi, xi) => math.abs(bi - xi) < 1e-9 })
  }

  test("cg solves a diagonal system") {
    val a = Array(Array(2.0, 0, 0), Array(0.0, 4, 0), Array(0.0, 0, 8))
    val x = LinAlg.cg(dense(a), Array(2.0, 4.0, 8.0))
    assert(x.forall(v => math.abs(v - 1.0) < 1e-9))
  }

  for (k <- 0 until 5) {
    test(s"cg matches Gaussian elimination on a random SPD system (case $k)") {
      val rnd = new scala.util.Random(50 + k)
      val n = 6 + k
      val m = Array.fill(n, n)(rnd.nextDouble() - 0.5)
      // A = MᵀM + I is SPD
      val a = Array.tabulate(n, n) { (i, j) =>
        (0 until n).map(t => m(t)(i) * m(t)(j)).sum + (if (i == j) 1.0 else 0.0)
      }
      val b = Array.fill(n)(rnd.nextDouble())
      val cg = LinAlg.cg(dense(a), b)
      val ge = LinAlg.solveDense(a, b)
      cg.zip(ge).foreach { case (x, y) => assert(math.abs(x - y) < 1e-7) }
    }
  }

  test("cg with b = 0 returns 0") {
    assert(LinAlg.cg(v => v, Array(0.0, 0.0)).forall(_ == 0.0))
  }

  test("solveDense handles permutation-needing pivots") {
    val a = Array(Array(0.0, 1.0), Array(1.0, 0.0))
    val x = LinAlg.solveDense(a, Array(3.0, 5.0))
    assert(math.abs(x(0) - 5.0) < 1e-12 && math.abs(x(1) - 3.0) < 1e-12)
  }

  test("solveDense rejects singular systems") {
    val a = Array(Array(1.0, 1.0), Array(2.0, 2.0))
    intercept[IllegalArgumentException] {
      LinAlg.solveDense(a, Array(1.0, 2.0))
    }
  }
}
