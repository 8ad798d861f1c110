package repro.data

import repro.ml.LocalMatrix
import scala.util.Random

/** Synthetic binary-classification data standing in for the paper's
  * evaluation datasets (12 OpenML benchmarks, Table IV; 3 Ant Financial
  * fraud datasets, Table VII). See DESIGN.md §3 for the substitution
  * rationale: labels depend on *planted pairwise interactions* (products,
  * ratios, sums, differences of hidden feature pairs), which is precisely
  * the structure SAFE's path mining is designed to find and its arithmetic
  * operators to exploit.
  */
object SynthClass {

  /** One dataset: our (possibly capped) sizes plus the paper's originals. */
  final case class DatasetSpec(
      name: String,
      nTrain: Int, nValid: Int, nTest: Int, dim: Int,
      paperTrain: Int, paperValid: Int, paperTest: Int, paperDim: Int,
      nInteract: Int, noise: Double, posRate: Double)

  final case class Dataset(spec: DatasetSpec, train: LocalMatrix, valid: LocalMatrix, test: LocalMatrix)

  /** Global scale knob for the bench grid (1.0 = capped sizes of DESIGN.md). */
  def benchScale: Double = sys.env.get("SAFE_BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  private def sc(n: Int, lo: Int = 200): Int = math.max(lo, math.round(n * benchScale).toInt)

  /** Table IV lookalikes (sizes capped for the bench budget; paper sizes kept
    * for the printed table). nInteract/noise vary so dataset difficulty
    * spreads like the paper's (banknote easy … eeg-eye hard).
    */
  def benchmarks: Seq[DatasetSpec] = Seq(
    DatasetSpec("valley",   sc(900),  0,        sc(312),  30, 900,   0,     312,   100, 5, 1.2, 0.50),
    DatasetSpec("banknote", sc(1000), 0,        sc(372),  4,  1000,  0,     372,   4,   2, 0.3, 0.45),
    DatasetSpec("gina",     sc(2800), 0,        sc(668),  50, 2800,  0,     668,   970, 8, 1.0, 0.49),
    DatasetSpec("spambase", sc(3000), 0,        sc(801),  40, 3800,  0,     801,   57,  6, 0.8, 0.40),
    DatasetSpec("phoneme",  sc(3000), 0,        sc(904),  5,  4500,  0,     904,   5,   2, 0.9, 0.30),
    DatasetSpec("wind",     sc(3000), 0,        sc(1200), 14, 5000,  0,     1574,  14,  4, 0.9, 0.50),
    DatasetSpec("ailerons", sc(3000), sc(600),  sc(1200), 30, 9000,  2000,  2750,  40,  5, 0.7, 0.42),
    DatasetSpec("eeg-eye",  sc(3000), sc(600),  sc(1200), 14, 10000, 2000,  2980,  14,  4, 1.6, 0.45),
    DatasetSpec("magic",    sc(3000), sc(600),  sc(1200), 10, 13000, 3000,  3020,  10,  3, 1.0, 0.35),
    DatasetSpec("nomao",    sc(4000), sc(800),  sc(1500), 40, 22000, 6000,  6000,  118, 6, 0.6, 0.29),
    DatasetSpec("bank",     sc(4000), sc(800),  sc(1500), 30, 35211, 4000,  6000,  51,  5, 1.5, 0.12),
    DatasetSpec("vehicle",  sc(5000), sc(1000), sc(1500), 30, 60000, 18528, 20000, 100, 6, 1.1, 0.50),
  )

  /** Table VII lookalikes: fraud-like (rare positives), paper dims, rows
    * scaled to `SAFE_BIZ_ROWS` (default 100k train).
    */
  def business: Seq[DatasetSpec] = {
    val rows = sys.env.get("SAFE_BIZ_ROWS").map(_.toInt).getOrElse(40000)
    val v = rows / 4
    Seq(
      DatasetSpec("Data1", rows, v, v, 81, 2502617, 625655, 625655, 81, 8, 1.0, 0.03),
      DatasetSpec("Data2", rows, v, v, 44, 7282428, 1820607, 1820607, 44, 6, 1.3, 0.04),
      DatasetSpec("Data3", rows, v, v, 73, 8000000, 2000000, 2000000, 73, 7, 1.1, 0.03),
    )
  }

  def specByName(name: String): DatasetSpec =
    (benchmarks ++ business).find(_.name == name)
      .getOrElse(throw new NoSuchElementException(s"unknown dataset $name"))

  /** Deterministic generation of one dataset realization.
    *
    * Structure, for M features:
    *  - informative block: the first ceil(0.6·M) features (standard normal,
    *    randomly scaled/shifted so magnitudes differ);
    *  - `nInteract` hidden pairs (a_k, b_k) within the informative block;
    *    each contributes w_k·φ_k(x_a, x_b) with φ cycling through
    *    product / safe-ratio / sum / difference;
    *  - weak linear effects on informative features;
    *  - ~10% redundant features (affine copies of informative ones + noise)
    *    to exercise the Pearson stage;
    *  - the rest pure noise;
    *  - label ~ Bernoulli(sigmoid(score − b)) with b calibrated so the
    *    positive rate matches `posRate`.
    */
  def generate(spec: DatasetSpec, seed: Long): Dataset = {
    val rng = new Random(spec.name.hashCode * 31L + seed)
    val n = spec.nTrain + spec.nValid + spec.nTest
    val m = spec.dim
    val nInfo = math.max(2, math.ceil(0.6 * m).toInt)
    val nRedund = math.max(0, math.min(m - nInfo, math.max(1, m / 10)))

    val scales = Array.fill(nInfo)(math.exp(rng.nextGaussian() * 1.0))
    val shifts = Array.fill(nInfo)(rng.nextGaussian() * 2.0)

    // interaction pairs and their functional forms
    val pairs = Array.fill(spec.nInteract) {
      val a = rng.nextInt(nInfo)
      var b = rng.nextInt(nInfo)
      while (b == a) b = rng.nextInt(nInfo)
      (a, b)
    }
    val interW = Array.fill(spec.nInteract)(1.0 + rng.nextDouble())
    val linW = Array.fill(nInfo)(if (rng.nextDouble() < 0.4) rng.nextGaussian() * 0.3 else 0.0)
    val redundSrc = Array.fill(nRedund)(rng.nextInt(nInfo))
    val redundA = Array.fill(nRedund)(0.5 + rng.nextDouble() * 2.0)
    val redundB = Array.fill(nRedund)(rng.nextGaussian())

    val x = Array.ofDim[Double](n, m)
    val rawScore = new Array[Double](n)
    var i = 0
    while (i < n) {
      val z = Array.fill(nInfo)(rng.nextGaussian())
      var j = 0
      while (j < nInfo) { x(i)(j) = z(j) * scales(j) + shifts(j); j += 1 }
      while (j < nInfo + nRedund) {
        val k = j - nInfo
        x(i)(j) = x(i)(redundSrc(k)) * redundA(k) + redundB(k) + rng.nextGaussian() * 0.05
        j += 1
      }
      while (j < m) { x(i)(j) = rng.nextGaussian(); j += 1 }

      var s = 0.0
      var k = 0
      while (k < spec.nInteract) {
        val (a, b) = pairs(k)
        val va = z(a); val vb = z(b) // interactions act on the latent scale
        val phi = (k % 4) match {
          case 0 => va * vb
          case 1 => if (math.abs(vb) < 0.2) va / 0.2 * math.signum(vb + 1e-9) else va / vb
          case 2 => va + vb
          case _ => va - vb
        }
        s += interW(k) * math.max(-6, math.min(6, phi))
        k += 1
      }
      var l = 0
      while (l < nInfo) { s += linW(l) * z(l); l += 1 }
      rawScore(i) = s + rng.nextGaussian() * spec.noise
      i += 1
    }

    // calibrate intercept so P(label=1) ≈ posRate
    val sortedScores = rawScore.clone()
    java.util.Arrays.sort(sortedScores)
    val cut = sortedScores(math.min(n - 1, ((1.0 - spec.posRate) * n).toInt))
    val y = new Array[Double](n)
    i = 0
    while (i < n) {
      val p = repro.ml.Metrics.sigmoid((rawScore(i) - cut) * 2.0)
      y(i) = if (rng.nextDouble() < p) 1.0 else 0.0
      i += 1
    }

    val names = Array.tabulate(m)(j => s"x$j")
    val all = LocalMatrix(names, x, y)
    val idx = rng.shuffle((0 until n).toList).toArray
    val trainIdx = idx.slice(0, spec.nTrain)
    val validIdx = idx.slice(spec.nTrain, spec.nTrain + spec.nValid)
    val testIdx = idx.slice(spec.nTrain + spec.nValid, n)
    Dataset(spec, all.takeRows(trainIdx), all.takeRows(validIdx), all.takeRows(testIdx))
  }

  def generateByName(name: String, seed: Long): Dataset = generate(specByName(name), seed)
}
