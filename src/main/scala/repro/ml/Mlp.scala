package repro.ml

import scala.util.Random

/** One-hidden-layer MLP (ReLU + sigmoid output, Adam, mini-batches) — the
  * "MLP" evaluation classifier.
  */
object Mlp {

  final case class MlpParams(
      hidden: Int = 32,
      epochs: Int = 40,
      batch: Int = 64,
      lr: Double = 1e-3,
      l2: Double = 1e-5,
      seed: Long = 0)

  final case class MlpModel(
      w1: Array[Array[Double]], b1: Array[Double],
      w2: Array[Double], b2: Double, scaler: Scaler) {
    def predictProba(m: LocalMatrix): Array[Double] = {
      val xs = scaler.transform(m.x)
      xs.map { row =>
        var z = b2
        var hIdx = 0
        while (hIdx < w2.length) {
          var a = b1(hIdx)
          val wr = w1(hIdx)
          var j = 0
          while (j < row.length) { a += wr(j) * row(j); j += 1 }
          if (a > 0) z += w2(hIdx) * a
          hIdx += 1
        }
        Metrics.sigmoid(z)
      }
    }
  }

  def fit(m: LocalMatrix, params: MlpParams = MlpParams()): MlpModel = {
    val rng = new Random(params.seed)
    val scaler = Scaler.fit(m.x)
    val xs = scaler.transform(m.x)
    val n = m.rows
    val d = m.cols
    val hN = params.hidden
    val limit1 = math.sqrt(6.0 / (d + hN))
    val w1 = Array.fill(hN, d)((rng.nextDouble() * 2 - 1) * limit1)
    val b1 = new Array[Double](hN)
    val limit2 = math.sqrt(6.0 / (hN + 1))
    val w2 = Array.fill(hN)((rng.nextDouble() * 2 - 1) * limit2)
    var b2 = 0.0
    // Adam state (flat over all params)
    val mW1 = Array.ofDim[Double](hN, d); val vW1 = Array.ofDim[Double](hN, d)
    val mB1 = new Array[Double](hN); val vB1 = new Array[Double](hN)
    val mW2 = new Array[Double](hN); val vW2 = new Array[Double](hN)
    var mB2 = 0.0; var vB2 = 0.0
    val (beta1, beta2, eps) = (0.9, 0.999, 1e-8)
    var step = 0

    val order = (0 until n).toArray
    for (_ <- 0 until params.epochs) {
      // Fisher–Yates shuffle for mini-batch order
      var i = n - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = order(i); order(i) = order(j); order(j) = t; i -= 1 }
      var start = 0
      while (start < n) {
        val end = math.min(n, start + params.batch)
        val bs = end - start
        val gW1 = Array.ofDim[Double](hN, d)
        val gB1 = new Array[Double](hN)
        val gW2 = new Array[Double](hN)
        var gB2 = 0.0
        var bi = start
        while (bi < end) {
          val row = xs(order(bi))
          val y = m.y(order(bi))
          val act = new Array[Double](hN)
          var z = b2
          var hh = 0
          while (hh < hN) {
            var a = b1(hh)
            val wr = w1(hh)
            var j = 0
            while (j < d) { a += wr(j) * row(j); j += 1 }
            act(hh) = if (a > 0) a else 0.0
            z += w2(hh) * act(hh)
            hh += 1
          }
          val delta = Metrics.sigmoid(z) - y // dL/dz for BCE + sigmoid
          gB2 += delta
          hh = 0
          while (hh < hN) {
            gW2(hh) += delta * act(hh)
            if (act(hh) > 0) {
              val dh = delta * w2(hh)
              gB1(hh) += dh
              val gr = gW1(hh)
              var j = 0
              while (j < d) { gr(j) += dh * row(j); j += 1 }
            }
            hh += 1
          }
          bi += 1
        }
        // Adam update
        step += 1
        val c1 = 1 - math.pow(beta1, step)
        val c2 = 1 - math.pow(beta2, step)
        var hh = 0
        while (hh < hN) {
          var j = 0
          while (j < d) {
            val g = gW1(hh)(j) / bs + params.l2 * w1(hh)(j)
            mW1(hh)(j) = beta1 * mW1(hh)(j) + (1 - beta1) * g
            vW1(hh)(j) = beta2 * vW1(hh)(j) + (1 - beta2) * g * g
            w1(hh)(j) -= params.lr * (mW1(hh)(j) / c1) / (math.sqrt(vW1(hh)(j) / c2) + eps)
            j += 1
          }
          val g1 = gB1(hh) / bs
          mB1(hh) = beta1 * mB1(hh) + (1 - beta1) * g1
          vB1(hh) = beta2 * vB1(hh) + (1 - beta2) * g1 * g1
          b1(hh) -= params.lr * (mB1(hh) / c1) / (math.sqrt(vB1(hh) / c2) + eps)
          val g2 = gW2(hh) / bs + params.l2 * w2(hh)
          mW2(hh) = beta1 * mW2(hh) + (1 - beta1) * g2
          vW2(hh) = beta2 * vW2(hh) + (1 - beta2) * g2 * g2
          w2(hh) -= params.lr * (mW2(hh) / c1) / (math.sqrt(vW2(hh) / c2) + eps)
          hh += 1
        }
        val gb2 = gB2 / bs
        mB2 = beta1 * mB2 + (1 - beta1) * gb2
        vB2 = beta2 * vB2 + (1 - beta2) * gb2 * gb2
        b2 -= params.lr * (mB2 / c1) / (math.sqrt(vB2 / c2) + eps)
        start = end
      }
    }
    MlpModel(w1, b1, w2, b2, scaler)
  }
}
