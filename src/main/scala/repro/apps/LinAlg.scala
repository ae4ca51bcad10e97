package repro.apps

/** Small dense linear algebra used by the model-training layer: the gram
  * matrices are tiny (tens to a few hundred features), so everything runs on
  * the driver — exactly as in the paper, where the application layer consumes
  * the batch output and "takes relatively insignificant time".
  */
object LinAlg {

  /** Solve `M x = b` by Gaussian elimination with partial pivoting.
    * `M` is modified in place.
    */
  def solve(m: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = m.length
    require(m.forall(_.length == n) && b.length == n, "solve: shape mismatch")
    val x = b.clone()
    for (col <- 0 until n) {
      var piv = col
      for (r <- col + 1 until n) if (math.abs(m(r)(col)) > math.abs(m(piv)(col))) piv = r
      if (piv != col) {
        val t = m(col); m(col) = m(piv); m(piv) = t
        val tb = x(col); x(col) = x(piv); x(piv) = tb
      }
      require(math.abs(m(col)(col)) > 1e-12, s"solve: singular matrix at column $col")
      for (r <- col + 1 until n) {
        val f = m(r)(col) / m(col)(col)
        if (f != 0.0) {
          for (c <- col until n) m(r)(c) -= f * m(col)(c)
          x(r) -= f * x(col)
        }
      }
    }
    for (col <- n - 1 to 0 by -1) {
      var s = x(col)
      for (c <- col + 1 until n) s -= m(col)(c) * x(c)
      x(col) = s / m(col)(col)
    }
    x
  }

  def matVec(m: Array[Array[Double]], v: Array[Double]): Array[Double] =
    m.map(row => dot(row, v))

  def dot(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def norm2(a: Array[Double]): Double = math.sqrt(dot(a, a))

  /** Batch gradient descent on the ridge objective
    * `J(t) = 1/(2N) (t'At - 2 b't + yy) + λ/2 |t|²`, i.e. gradient
    * `(At - b)/N + λ t`, using Armijo backtracking line search seeded by the
    * Barzilai–Borwein step size — the optimizer the paper runs over the covar
    * matrix (§B "Setup for Model Training").
    *
    * @param a  gram matrix X'X of the features
    * @param b  X'y vector
    * @param yy y'y scalar
    * @param n  dataset size |D|
    * @return (parameters, iterations)
    */
  def bgdRidge(a: Array[Array[Double]], b: Array[Double], yy: Double, n: Double,
               lambda: Double, maxIter: Int = 5000, tol: Double = 1e-10)
      : (Array[Double], Int) = {
    val d = b.length
    var theta = Array.fill(d)(0.0)
    def grad(t: Array[Double]): Array[Double] = {
      val at = matVec(a, t)
      Array.tabulate(d)(i => (at(i) - b(i)) / n + lambda * t(i))
    }
    def obj(t: Array[Double]): Double = {
      val at = matVec(a, t)
      (dot(t, at) - 2 * dot(b, t) + yy) / (2 * n) + lambda / 2 * dot(t, t)
    }
    var g = grad(theta)
    var step = 1.0 / math.max(1.0, norm2(g))
    var it = 0
    var prevTheta: Array[Double] = null
    var prevG: Array[Double]     = null
    var stalled = false
    while (it < maxIter && !stalled && norm2(g) > tol) {
      // Barzilai–Borwein step from the previous iterate when available.
      if (prevTheta != null) {
        val dt = Array.tabulate(d)(i => theta(i) - prevTheta(i))
        val dg = Array.tabulate(d)(i => g(i) - prevG(i))
        val denom = dot(dt, dg)
        if (math.abs(denom) > 1e-300) step = math.abs(dot(dt, dt) / denom)
      }
      // Armijo backtracking.
      val j0 = obj(theta)
      val g2 = dot(g, g)
      var s  = step
      var cand = Array.tabulate(d)(i => theta(i) - s * g(i))
      var back = 0
      while (obj(cand) > j0 - 1e-4 * s * g2 && back < 60) {
        s /= 2; back += 1
        cand = Array.tabulate(d)(i => theta(i) - s * g(i))
      }
      prevTheta = theta; prevG = g
      theta = cand
      g = grad(theta)
      it += 1
      // Converged to floating-point resolution: the line search can no
      // longer improve the objective — stop instead of spinning to maxIter.
      val jNew = obj(theta)
      if (j0 - jNew <= 1e-14 * (1.0 + math.abs(j0))) stalled = true
    }
    (theta, it)
  }
}
