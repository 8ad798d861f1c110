package repro.ml

import scala.util.Random

/** k-nearest-neighbours (z-scored Euclidean, brute force) — the "kNN"
  * evaluation classifier. The reference set is capped (`maxRef`) to keep the
  * O(N_test × N_ref × M) scan inside the bench budget; sklearn reaches for a
  * KD-tree instead, which changes speed, not scores, for exact k-NN — the
  * cap is the only approximation and is documented in DESIGN.md.
  */
object Knn {

  final case class KnnParams(k: Int = 5, maxRef: Int = 2000, seed: Long = 0)

  final case class KnnModel(refX: Array[Array[Double]], refY: Array[Double],
                            scaler: Scaler, k: Int) {
    def predictProba(m: LocalMatrix): Array[Double] = {
      val xs = scaler.transform(m.x)
      xs.map { q =>
        // distance-indexed top-k via simple insertion (k is tiny)
        val bestD = Array.fill(k)(Double.MaxValue)
        val bestY = new Array[Double](k)
        var i = 0
        while (i < refX.length) {
          val r = refX(i)
          var dist = 0.0
          var j = 0
          while (j < q.length) { val diff = q(j) - r(j); dist += diff * diff; j += 1 }
          if (dist < bestD(k - 1)) {
            var pos = k - 1
            while (pos > 0 && bestD(pos - 1) > dist) {
              bestD(pos) = bestD(pos - 1); bestY(pos) = bestY(pos - 1); pos -= 1
            }
            bestD(pos) = dist; bestY(pos) = refY(i)
          }
          i += 1
        }
        val kk = math.min(k, refX.length)
        var s = 0.0
        var t = 0
        while (t < kk) { s += bestY(t); t += 1 }
        s / kk
      }
    }
  }

  def fit(m: LocalMatrix, params: KnnParams = KnnParams()): KnnModel = {
    val scaler = Scaler.fit(m.x)
    val xs = scaler.transform(m.x)
    val (refX, refY) =
      if (m.rows <= params.maxRef) (xs, m.y)
      else {
        val rng = new Random(params.seed)
        val idx = rng.shuffle((0 until m.rows).toList).take(params.maxRef).toArray
        (idx.map(xs), idx.map(m.y))
      }
    KnnModel(refX, refY, scaler, math.max(1, params.k))
  }
}
