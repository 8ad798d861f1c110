package repro.ml

import org.apache.spark.sql.DataFrame

/** Quantile feature binning — the discretization substrate shared by the
  * GBDT (histogram splits), the IV filter (equal-frequency bins, Alg. 3) and
  * the comparators' information-gain scoring.
  *
  * Bin semantics: `edges` are strictly increasing interior cut points;
  * value v lands in bin `#edges ≤ v` counted from the left, i.e.
  * `bin(v) = upperBound(edges, v)` with v ≤ edges(0) → 0 and
  * v > edges(last) → edges.length. A feature with e edges has e+1 bins.
  */
object Binning {

  /** Exact equal-frequency interior edges for one column (≤ maxBins bins).
    * Duplicate quantiles are collapsed, so constant columns yield 0 edges.
    */
  def quantileEdges(values: Array[Double], maxBins: Int): Array[Double] = {
    require(maxBins >= 2, "need at least 2 bins")
    if (values.isEmpty) return Array.empty
    val sorted = values.clone()
    java.util.Arrays.sort(sorted)
    val n = sorted.length
    val edges = (1 until maxBins).map { q =>
      sorted(math.min(n - 1, (q.toLong * n / maxBins).toInt))
    }.distinct.toArray
    // Drop the global max as an edge: everything would land left of it anyway,
    // and keeping it can create an empty top bin.
    val mx = sorted(n - 1)
    edges.filter(_ < mx)
  }

  /** Bin index of `v` given interior `edges` (see class doc). */
  def binOf(v: Double, edges: Array[Double]): Int = {
    var lo = 0
    var hi = edges.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (v <= edges(mid)) hi = mid else lo = mid + 1
    }
    lo
  }

  /** Per-column interior edges for a whole matrix. */
  def fitLocal(m: LocalMatrix, maxBins: Int): Array[Array[Double]] =
    Array.tabulate(m.cols)(j => quantileEdges(m.column(j), maxBins))

  /** Per-column interior edges computed by Spark's approximate quantiles —
    * the distributed path used on business-scale data. `labelCol` excluded.
    */
  def fitSpark(df: DataFrame, featNames: Array[String], maxBins: Int,
               relErr: Double = 0.001): Array[Array[Double]] = {
    require(maxBins >= 2, "need at least 2 bins")
    import org.apache.spark.sql.functions.max
    val probs = (1 until maxBins).map(_.toDouble / maxBins).toArray
    val qs = df.stat.approxQuantile(featNames, probs, relErr)
    val maxRow = df.agg(max(featNames.head), featNames.tail.map(max(_)).toIndexedSeq: _*).head()
    featNames.indices.map { j =>
      val colMax = if (maxRow.isNullAt(j)) Double.PositiveInfinity
                   else maxRow.get(j).toString.toDouble
      // Same contract as quantileEdges: strictly increasing, below column max.
      qs(j).distinct.sorted.filter(_ < colMax)
    }.toArray
  }

  /** Apply per-column edges to a matrix, producing row-major bin codes.
    * Bin counts must fit a byte (maxBins ≤ 127 enforced upstream).
    */
  def applyLocal(m: LocalMatrix, edges: Array[Array[Double]]): Array[Array[Byte]] = {
    require(edges.length == m.cols, "edges width mismatch")
    Array.tabulate(m.rows) { i =>
      val row = new Array[Byte](m.cols)
      var j = 0
      while (j < m.cols) { row(j) = binOf(m.x(i)(j), edges(j)).toByte; j += 1 }
      row
    }
  }

  /** Number of bins per column implied by `edges`. */
  def binCounts(edges: Array[Array[Double]]): Array[Int] = edges.map(_.length + 1)
}
