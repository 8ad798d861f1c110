package repro.ml

/** Z-score standardizer fitted on train, applied to train and test. GD-based
  * models (LR, SVM, MLP) and kNN use it internally — generated features can
  * span wildly different scales (see DESIGN.md deviation notes).
  */
final case class Scaler(mean: Array[Double], std: Array[Double]) {
  def transform(x: Array[Array[Double]]): Array[Array[Double]] =
    x.map { row =>
      Array.tabulate(row.length)(j => (row(j) - mean(j)) / std(j))
    }
}

object Scaler {
  def fit(x: Array[Array[Double]]): Scaler = {
    require(x.nonEmpty, "cannot fit scaler on empty data")
    val m = x(0).length
    val mean = new Array[Double](m)
    val sq = new Array[Double](m)
    x.foreach { row =>
      var j = 0
      while (j < m) { mean(j) += row(j); sq(j) += row(j) * row(j); j += 1 }
    }
    var j = 0
    while (j < m) {
      mean(j) /= x.length
      val v = math.max(0.0, sq(j) / x.length - mean(j) * mean(j))
      sq(j) = math.max(1e-9, math.sqrt(v))
      j += 1
    }
    Scaler(mean, sq)
  }
}

/** Logistic Regression and linear SVM (hinge loss), both trained full-batch
  * with Adam — the "LR" and "SVM" evaluation classifiers.
  */
object Linear {

  final case class LinearParams(epochs: Int = 150, lr: Double = 0.05, l2: Double = 1e-4)

  final case class LinearModel(wts: Array[Double], bias: Double, scaler: Scaler) {
    def predictScore(m: LocalMatrix): Array[Double] = {
      val xs = scaler.transform(m.x)
      xs.map { row =>
        var z = bias
        var j = 0
        while (j < wts.length) { z += wts(j) * row(j); j += 1 }
        z
      }
    }
    def predictProba(m: LocalMatrix): Array[Double] = predictScore(m).map(Metrics.sigmoid)
  }

  def fitLogistic(m: LocalMatrix, params: LinearParams = LinearParams()): LinearModel =
    fit(m, params, hinge = false)

  def fitSvm(m: LocalMatrix, params: LinearParams = LinearParams()): LinearModel =
    fit(m, params, hinge = true)

  private def fit(m: LocalMatrix, params: LinearParams, hinge: Boolean): LinearModel = {
    val scaler = Scaler.fit(m.x)
    val xs = scaler.transform(m.x)
    val n = m.rows
    val d = m.cols
    val w = new Array[Double](d)
    var b = 0.0
    // Adam state
    val mW = new Array[Double](d); val vW = new Array[Double](d)
    var mB = 0.0; var vB = 0.0
    val (b1, b2, eps) = (0.9, 0.999, 1e-8)
    var t = 0
    while (t < params.epochs) {
      val gW = new Array[Double](d)
      var gB = 0.0
      var i = 0
      while (i < n) {
        val row = xs(i)
        var z = b
        var j = 0
        while (j < d) { z += w(j) * row(j); j += 1 }
        val g =
          if (hinge) {
            val yy = 2.0 * m.y(i) - 1.0 // hinge on {-1,+1}
            if (yy * z < 1.0) -yy else 0.0
          } else Metrics.sigmoid(z) - m.y(i)
        if (g != 0.0) {
          j = 0
          while (j < d) { gW(j) += g * row(j); j += 1 }
          gB += g
        }
        i += 1
      }
      var j = 0
      val step = t + 1
      while (j < d) {
        val grad = gW(j) / n + params.l2 * w(j)
        mW(j) = b1 * mW(j) + (1 - b1) * grad
        vW(j) = b2 * vW(j) + (1 - b2) * grad * grad
        val mHat = mW(j) / (1 - math.pow(b1, step))
        val vHat = vW(j) / (1 - math.pow(b2, step))
        w(j) -= params.lr * mHat / (math.sqrt(vHat) + eps)
        j += 1
      }
      val gradB = gB / n
      mB = b1 * mB + (1 - b1) * gradB
      vB = b2 * vB + (1 - b2) * gradB * gradB
      b -= params.lr * (mB / (1 - math.pow(b1, step))) / (math.sqrt(vB / (1 - math.pow(b2, step))) + eps)
      t += 1
    }
    LinearModel(w, b, scaler)
  }
}
