package repro.bench

import repro.ml.Metrics

/** Feature-stability measurement for Table VI (§V-A5).
  *
  * Run an FE method T times (fresh data realization each run), collect the
  * produced feature identities, and compute the Jensen–Shannon divergence
  * between the observed occurrence distribution Dis = {(feature, t_i)} and
  * the ideal distribution where the same W features appear in all T runs.
  * Smaller = more stable.
  */
object Stability {

  /** JSD between the observed feature-occurrence distribution and the ideal
    * one. `runs` is the list of feature-id sets produced by each repetition.
    */
  def jsdScore(runs: Seq[Seq[String]]): Double = {
    require(runs.nonEmpty, "need at least one run")
    val counts = scala.collection.mutable.Map.empty[String, Int]
    runs.foreach(_.foreach(id => counts(id) = counts.getOrElse(id, 0) + 1))
    val sorted = counts.values.toArray.sortBy(-_)
    // W = the per-run output width; ideal = W features, each appearing T times
    val w = math.max(1, math.round(runs.map(_.size).sum.toDouble / runs.length).toInt)
    val support = math.max(sorted.length, w)
    val total = sorted.map(_.toDouble).sum
    val p = Array.tabulate(support)(i => if (i < sorted.length) sorted(i) / total else 0.0)
    val q = Array.tabulate(support)(i => if (i < w) 1.0 / w else 0.0)
    Metrics.jsd(p, q)
  }

  /** Run `fe` T times (seeded 0..T-1) and score stability of its outputs. */
  def measure(tRuns: Int, fe: Long => Seq[String]): Double =
    jsdScore((0 until tRuns).map(t => fe(t.toLong)))
}
