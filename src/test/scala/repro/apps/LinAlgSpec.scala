package repro.apps

import org.scalatest.funsuite.AnyFunSuite

class LinAlgSpec extends AnyFunSuite {

  def approx(a: Array[Double], b: Array[Double], tol: Double = 1e-8): Boolean =
    a.length == b.length && a.zip(b).forall { case (x, y) => math.abs(x - y) < tol }

  test("solve identity") {
    val m = Array(Array(1.0, 0.0), Array(0.0, 1.0))
    assert(approx(LinAlg.solve(m, Array(3.0, 4.0)), Array(3.0, 4.0)))
  }

  test("solve a 3x3 system with pivoting") {
    // Needs row swaps: leading zero.
    val m = Array(
      Array(0.0, 2.0, 1.0),
      Array(1.0, 1.0, 1.0),
      Array(2.0, 0.0, 3.0))
    val b = Array(7.0, 6.0, 11.0) // x = (1, 2, 3)
    assert(approx(LinAlg.solve(m, b), Array(1.0, 2.0, 3.0)))
  }

  test("solve rejects singular matrices") {
    val m = Array(Array(1.0, 2.0), Array(2.0, 4.0))
    intercept[IllegalArgumentException](LinAlg.solve(m, Array(1.0, 2.0)))
  }

  test("solve reproduces random SPD systems") {
    val rnd = new scala.util.Random(7)
    for (trial <- 1 to 10) {
      val n = 2 + rnd.nextInt(6)
      val g = Array.fill(n, n)(rnd.nextDouble() * 2 - 1)
      // SPD: A = G'G + I
      val a = Array.tabulate(n, n)((i, j) =>
        (0 until n).map(k => g(k)(i) * g(k)(j)).sum + (if (i == j) 1.0 else 0.0))
      val x = Array.fill(n)(rnd.nextDouble() * 4 - 2)
      val b = LinAlg.matVec(a, x)
      assert(approx(LinAlg.solve(a.map(_.clone()), b), x, 1e-7), s"trial $trial")
    }
  }

  test("dot and norm2") {
    assert(LinAlg.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)) == 32.0)
    assert(math.abs(LinAlg.norm2(Array(3.0, 4.0)) - 5.0) < 1e-12)
  }

  test("BGD (Armijo + BB) converges to the ridge closed form") {
    val rnd = new scala.util.Random(11)
    val n = 5
    val g = Array.fill(n, n)(rnd.nextDouble())
    val a = Array.tabulate(n, n)((i, j) =>
      (0 until n).map(k => g(k)(i) * g(k)(j)).sum + (if (i == j) 2.0 else 0.0))
    val b = Array.fill(n)(rnd.nextDouble() * 10)
    val N = 100.0
    val lambda = 0.01
    // closed form: (A + λN I) θ = b
    val m = a.map(_.clone())
    for (i <- 0 until n) m(i)(i) += lambda * N
    val closed = LinAlg.solve(m, b.clone())
    val yy = 50.0
    val (theta, iters) = LinAlg.bgdRidge(a, b, yy, N, lambda, maxIter = 20000, tol = 1e-9)
    assert(iters < 20000, "did not converge")
    assert(approx(theta, closed, 1e-4), s"bgd=${theta.mkString(",")} closed=${closed.mkString(",")}")
  }

  test("BGD objective decreases monotonically in the first steps") {
    val a = Array(Array(4.0, 1.0), Array(1.0, 3.0))
    val b = Array(1.0, 2.0)
    val (theta, _) = LinAlg.bgdRidge(a, b, 10.0, 10.0, 0.0, maxIter = 500)
    val closed = LinAlg.solve(a.map(_.clone()), b.clone())
    assert(approx(theta, closed, 1e-6))
  }
}
