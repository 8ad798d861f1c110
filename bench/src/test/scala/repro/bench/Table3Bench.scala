package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table III (classification performance, 12 benchmark datasets ×
  * 6 methods × 9 classifiers) and prints Table IV (dataset info). Shape
  * assertions mirror the paper's headline claims: SAFE improves over ORIG on
  * average and does not lose to the RAND/IMP ablations.
  */
class Table3Bench extends AnyFunSuite {

  test("Table III / Table IV: SAFE improves mean AUC over ORIG and the ablations") {
    val sink: String => Unit = println
    Tables.tableIV(sink)
    sink("")
    val cells = Tables.tableIII(sink)

    def meanOf(method: String): Double = {
      val vs = cells.collect { case ((_, _, m), v) if m == method => v }
      vs.sum / vs.size
    }
    val means = Harness.MethodNames.map(m => m -> meanOf(m)).toMap
    sink("")
    sink("Mean 100xAUC per method (paper: SAFE best, +6.50% vs ORIG, +2.03% vs FCT, +3.74% vs TFC):")
    Harness.MethodNames.foreach(m => sink(f"  $m%-5s ${means(m)}%.2f"))

    assert(means("SAFE") > means("ORIG"), s"SAFE ${means("SAFE")} should beat ORIG ${means("ORIG")}")
    assert(means("SAFE") > means("TFC"), s"SAFE should beat TFC (paper: +3.74%)")
    assert(means("SAFE") >= means("RAND") - 0.5, s"SAFE should not lose to RAND")
    assert(means("SAFE") >= means("IMP") - 0.5, s"SAFE should not lose to IMP")
  }
}
