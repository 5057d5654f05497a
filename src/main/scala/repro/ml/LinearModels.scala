package repro.ml

/** Linear substrates: ridge regression (closed form, used by the "LRavocado"
  * task model and H2O-style feature selection) and logistic regression via
  * gradient descent (classification variant). Inputs are standardized
  * internally so coefficient magnitudes are comparable across features —
  * the property the H2O feature-selection baseline relies on.
  */
final class RidgeRegression(val lambda: Double = 1e-3) {
  private var w: Array[Double] = Array.empty // on standardized features
  private var b = 0.0
  private var mu: Array[Double] = Array.empty
  private var sd: Array[Double] = Array.empty

  def fit(x: Array[Array[Double]], y: Array[Double]): this.type = {
    require(x.nonEmpty, "ridge: empty input")
    val n = x.length; val d = x(0).length
    mu = new Array[Double](d); sd = new Array[Double](d)
    standardizeStats(x, mu, sd)
    val xs = x.map(standardize)
    // Normal equations on standardized X with intercept handled via centering.
    val ym = y.sum / n
    val a = Array.ofDim[Double](d, d)
    val g = new Array[Double](d)
    var i = 0
    while (i < n) {
      val xi = xs(i)
      val yc = y(i) - ym
      var p = 0
      while (p < d) {
        g(p) += xi(p) * yc
        var q = p
        while (q < d) { a(p)(q) += xi(p) * xi(q); q += 1 }
        p += 1
      }
      i += 1
    }
    var p = 0
    while (p < d) {
      a(p)(p) += lambda * n
      var q = p + 1
      while (q < d) { a(q)(p) = a(p)(q); q += 1 }
      p += 1
    }
    w = solve(a, g)
    b = ym
    this
  }

  def predict(xi: Array[Double]): Double = {
    val xs = standardize(xi)
    var s = b
    var j = 0
    while (j < w.length) { s += w(j) * xs(j); j += 1 }
    s
  }

  def predictAll(x: Array[Array[Double]]): Array[Double] = x.map(predict)

  /** Coefficients on standardized features (|coef| comparable across cols). */
  def coefficients: Array[Double] = w.clone()

  private def standardize(xi: Array[Double]): Array[Double] =
    Array.tabulate(xi.length)(j => (xi(j) - mu(j)) / sd(j))

  private def standardizeStats(x: Array[Array[Double]], mu: Array[Double], sd: Array[Double]): Unit = {
    val n = x.length; val d = mu.length
    var i = 0
    while (i < n) { var j = 0; while (j < d) { mu(j) += x(i)(j); j += 1 }; i += 1 }
    var j = 0
    while (j < d) { mu(j) /= n; j += 1 }
    i = 0
    while (i < n) {
      j = 0
      while (j < d) { val dv = x(i)(j) - mu(j); sd(j) += dv * dv; j += 1 }
      i += 1
    }
    j = 0
    while (j < d) { sd(j) = math.sqrt(sd(j) / n); if (sd(j) < 1e-9) sd(j) = 1.0; j += 1 }
  }

  /** Gaussian elimination with partial pivoting. */
  private def solve(a: Array[Array[Double]], bVec: Array[Double]): Array[Double] = {
    val d = bVec.length
    val m = Array.tabulate(d)(i => a(i) :+ bVec(i))
    var col = 0
    while (col < d) {
      var piv = col
      var r = col + 1
      while (r < d) { if (math.abs(m(r)(col)) > math.abs(m(piv)(col))) piv = r; r += 1 }
      val tmp = m(col); m(col) = m(piv); m(piv) = tmp
      val pv = m(col)(col)
      if (math.abs(pv) > 1e-12) {
        r = 0
        while (r < d) {
          if (r != col) {
            val f = m(r)(col) / pv
            var c = col
            while (c <= d) { m(r)(c) -= f * m(col)(c); c += 1 }
          }
          r += 1
        }
      }
      col += 1
    }
    Array.tabulate(d)(i => if (math.abs(m(i)(i)) > 1e-12) m(i)(d) / m(i)(i) else 0.0)
  }
}

/** L2-regularized logistic regression trained by full-batch gradient descent
  * on standardized features. Deterministic.
  */
final class LogisticRegressionModel(
    val lambda: Double = 1e-3,
    val lr: Double = 0.5,
    val iters: Int = 200,
) {
  private var w: Array[Double] = Array.empty
  private var b = 0.0
  private var mu: Array[Double] = Array.empty
  private var sd: Array[Double] = Array.empty

  private def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))

  def fit(x: Array[Array[Double]], y: Array[Double]): this.type = {
    require(x.nonEmpty, "logreg: empty input")
    require(y.forall(v => v == 0.0 || v == 1.0), "logreg: labels must be 0/1")
    val n = x.length; val d = x(0).length
    mu = new Array[Double](d); sd = new Array[Double](d)
    // reuse ridge's standardization logic inline
    var i = 0
    while (i < n) { var j = 0; while (j < d) { mu(j) += x(i)(j); j += 1 }; i += 1 }
    var j = 0
    while (j < d) { mu(j) /= n; j += 1 }
    i = 0
    while (i < n) { j = 0; while (j < d) { val dv = x(i)(j) - mu(j); sd(j) += dv * dv; j += 1 }; i += 1 }
    j = 0
    while (j < d) { sd(j) = math.sqrt(sd(j) / n); if (sd(j) < 1e-9) sd(j) = 1.0; j += 1 }
    val xs = x.map(xi => Array.tabulate(d)(j => (xi(j) - mu(j)) / sd(j)))

    w = new Array[Double](d); b = 0.0
    var it = 0
    while (it < iters) {
      val gw = new Array[Double](d)
      var gb = 0.0
      i = 0
      while (i < n) {
        var z = b
        j = 0
        while (j < d) { z += w(j) * xs(i)(j); j += 1 }
        val err = sigmoid(z) - y(i)
        gb += err
        j = 0
        while (j < d) { gw(j) += err * xs(i)(j); j += 1 }
        i += 1
      }
      b -= lr * gb / n
      j = 0
      while (j < d) { w(j) -= lr * (gw(j) / n + lambda * w(j)); j += 1 }
      it += 1
    }
    this
  }

  def predictProba(xi: Array[Double]): Double = {
    var z = b
    var j = 0
    while (j < w.length) { z += w(j) * (xi(j) - mu(j)) / sd(j); j += 1 }
    sigmoid(z)
  }

  def predict(xi: Array[Double]): Double = if (predictProba(xi) >= 0.5) 1.0 else 0.0
  def predictProbaAll(x: Array[Array[Double]]): Array[Double] = x.map(predictProba)
  def coefficients: Array[Double] = w.clone()
}
