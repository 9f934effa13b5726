package repro.ml.linreg

import repro.ml.linalg.{DenseMatrix, Vec}

/** Ridge linear regression trained by batch gradient descent over the
  * assembled Σ matrix (paper §3): because Σ does not depend on θ, the
  * aggregates are computed once and reused for every iteration — each BGD step
  * is then a small dense matrix-vector product, independent of |D|.
  *
  * Conventions (paper): the label's parameter is fixed to -1 and excluded from
  * learning; the intercept is not penalised.
  */
object LinearRegression {

  final case class Fit(theta: Array[Double], objective: Seq[Double], iterations: Int)

  /** J(θ) = (1/2N) θᵀΣθ + (λ/2)‖θ_free,≠intercept‖². */
  def objective(sigma: Sigma, theta: Array[Double], lambda: Double): Double = {
    val st = sigma.matrix * theta
    val quad = Vec.dot(theta, st) / (2.0 * sigma.count)
    val pen = sigma.freeIdx.drop(1).map(j => theta(j) * theta(j)).sum * lambda / 2.0
    quad + pen
  }

  /** ∇J over the free parameters (label entry forced to 0). */
  def gradient(sigma: Sigma, theta: Array[Double], lambda: Double): Array[Double] = {
    val st = sigma.matrix * theta
    val g = new Array[Double](theta.length)
    sigma.freeIdx.foreach { j =>
      g(j) = st(j) / sigma.count + (if (j == sigma.interceptIdx) 0.0 else lambda * theta(j))
    }
    g
  }

  /** BGD with Armijo backtracking line search; θ_label stays -1 throughout. */
  def trainBgd(sigma: Sigma, lambda: Double, maxIters: Int = 200, tol: Double = 1e-9): Fit = {
    var theta = new Array[Double](sigma.dim)
    theta(sigma.labelIdx) = -1.0
    val objs = scala.collection.mutable.ArrayBuffer(objective(sigma, theta, lambda))
    var it = 0
    var converged = false
    while (it < maxIters && !converged) {
      val g = gradient(sigma, theta, lambda)
      val gn = Vec.norm2(g)
      if (gn < tol) converged = true
      else {
        var step = 1.0
        val j0 = objs.last
        var next = Vec.axpy(-step, g, theta)
        var jn = objective(sigma, next, lambda)
        var tries = 0
        while (jn > j0 - 0.5 * step * gn * gn && tries < 60) {
          step *= 0.5
          next = Vec.axpy(-step, g, theta)
          jn = objective(sigma, next, lambda)
          tries += 1
        }
        if (jn >= j0) converged = true // no descent direction progress left
        else { theta = next; objs += jn }
      }
      it += 1
    }
    Fit(theta, objs.toSeq, it)
  }

  /** Closed-form ridge solution over the free parameters, for verification:
    * solve (Σ_ff/N + λI') θ_f = Σ_{f,label}/N (I' zero at the intercept).
    */
  def solveExact(sigma: Sigma, lambda: Double): Array[Double] = {
    val free = sigma.freeIdx
    val n = free.size
    val a = DenseMatrix.zeros(n, n)
    val b = new Array[Double](n)
    free.zipWithIndex.foreach { case (j, jj) =>
      free.zipWithIndex.foreach { case (k, kk) =>
        a(jj, kk) = sigma.matrix(j, k) / sigma.count +
          (if (j == k && j != sigma.interceptIdx) lambda else 0.0)
      }
      b(jj) = sigma.matrix(j, sigma.labelIdx) / sigma.count
    }
    val sol = a.solve(b)
    val theta = new Array[Double](sigma.dim)
    free.zipWithIndex.foreach { case (j, jj) => theta(j) = sol(jj) }
    theta(sigma.labelIdx) = -1.0
    theta
  }
}
