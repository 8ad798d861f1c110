package repro.bench

import repro.SparkSpec

/** Reproduces Table VIII (business-scale fraud datasets) with SAFE/RAND/IMP
  * running on the distributed Spark statistics backend, plus Table VII
  * (dataset info). Paper shape: SAFE consistently improves over ORIG for
  * LR/RF/XGB, with RAND/IMP in between.
  */
class Table8Bench extends SparkSpec {

  test("Table VIII / Table VII: SAFE (Spark backend) improves business AUC over ORIG") {
    val sink: String => Unit = println
    Tables.tableVII(sink)
    sink("")
    val cells = Tables.tableVIII(spark, sink)

    def meanOf(m: String): Double = {
      val vs = cells.collect { case ((_, _, mm), v) if mm == m => v }
      vs.sum / vs.size
    }
    val methods = Seq("ORIG", "RAND", "IMP", "SAFE")
    sink("")
    sink("Mean 100xAUC per method (paper: SAFE consistently best):")
    methods.foreach(m => sink(f"  $m%-5s ${meanOf(m)}%.2f"))

    assert(meanOf("SAFE") > meanOf("ORIG"),
      s"SAFE ${meanOf("SAFE")} should beat ORIG ${meanOf("ORIG")}")
    assert(meanOf("SAFE") >= meanOf("RAND") - 0.5, "SAFE should not lose to RAND")
    // per-dataset: SAFE never collapses below ORIG by a large margin
    SynthBusinessNames.foreach { ds =>
      val safeMean = Seq("LR", "RF", "XGB").map(c => cells((ds, c, "SAFE"))).sum / 3
      val origMean = Seq("LR", "RF", "XGB").map(c => cells((ds, c, "ORIG"))).sum / 3
      assert(safeMean > origMean - 1.0, s"$ds: SAFE $safeMean vs ORIG $origMean")
    }
  }

  private def SynthBusinessNames: Seq[String] = repro.data.SynthClass.business.map(_.name)
}
