package repro.predict

/** RBF-kernel ridge regression — the stand-in for the support-vector
  * regression of Tables 1–2 (kernel ridge is the least-squares SVM; same
  * hypothesis family). Written from scratch: standardize features, build
  * K_ij = exp(-||x_i-x_j||² / (2σ²)), solve (K + λI)α = y by Gaussian
  * elimination with partial pivoting.
  *
  * The paper's point is NEGATIVE — no smooth regressor over subgraph
  * features predicts straggler task times — so what matters is a competent,
  * correctly-fit model, which the tests verify on learnable functions.
  */
final class KernelRidge(lambda: Double = 1.0, sigma: Double = 1.0) {

  def fit(x: Array[Array[Double]], y: Array[Double]): KernelRidgeModel = {
    require(x.nonEmpty && x.length == y.length)
    val d = x(0).length
    // standardize columns
    val mean = new Array[Double](d)
    val std  = new Array[Double](d)
    for (j <- 0 until d) {
      val col = x.map(_(j))
      mean(j) = col.sum / col.length
      val v = col.map(c => (c - mean(j)) * (c - mean(j))).sum / col.length
      std(j) = math.max(math.sqrt(v), 1e-12)
    }
    val xs = x.map(r => Array.tabulate(d)(j => (r(j) - mean(j)) / std(j)))
    val n = xs.length
    val a = Array.ofDim[Double](n, n + 1)
    for (i <- 0 until n) {
      for (j <- 0 until n) {
        a(i)(j) = KernelRidge.rbf(xs(i), xs(j), sigma) + (if (i == j) lambda else 0.0)
      }
      a(i)(n) = y(i)
    }
    val alpha = KernelRidge.solve(a)
    new KernelRidgeModel(xs, alpha, mean, std, sigma)
  }
}

final class KernelRidgeModel(
    train: Array[Array[Double]],
    alpha: Array[Double],
    mean: Array[Double],
    std: Array[Double],
    sigma: Double) extends Serializable {

  def predict(x: Array[Double]): Double = {
    val xs = Array.tabulate(x.length)(j => (x(j) - mean(j)) / std(j))
    var s = 0.0
    var i = 0
    while (i < train.length) { s += alpha(i) * KernelRidge.rbf(train(i), xs, sigma); i += 1 }
    s
  }
}

object KernelRidge {

  private[predict] def rbf(a: Array[Double], b: Array[Double], sigma: Double): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.exp(-s / (2.0 * sigma * sigma))
  }

  /** Gaussian elimination with partial pivoting over the augmented matrix
    * a (n x (n+1)); returns the solution vector.
    */
  private[predict] def solve(a: Array[Array[Double]]): Array[Double] = {
    val n = a.length
    for (col <- 0 until n) {
      var piv = col
      for (r <- col + 1 until n) if (math.abs(a(r)(col)) > math.abs(a(piv)(col))) piv = r
      val tmp = a(col); a(col) = a(piv); a(piv) = tmp
      val diag = a(col)(col)
      require(math.abs(diag) > 1e-14, "singular system (increase lambda)")
      for (r <- col + 1 until n) {
        val f = a(r)(col) / diag
        if (f != 0.0) {
          var c = col
          while (c <= n) { a(r)(c) -= f * a(col)(c); c += 1 }
        }
      }
    }
    val x = new Array[Double](n)
    for (r <- n - 1 to 0 by -1) {
      var s = a(r)(n)
      for (c <- r + 1 until n) s -= a(r)(c) * x(c)
      x(r) = s / a(r)(r)
    }
    x
  }
}
