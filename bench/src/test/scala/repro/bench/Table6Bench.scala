package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table VI (feature stability via JSD against the ideal
  * distribution). Paper shape: SAFE's generated feature set is more stable
  * than RAND's (and generally the most stable of FCT/RAND/IMP/SAFE).
  */
class Table6Bench extends AnyFunSuite {

  test("Table VI: SAFE features are more stable (lower JSD) than RAND on average") {
    val scores = Tables.tableVI(println)
    def meanOf(m: String): Double = {
      val vs = scores.collect { case ((_, mm), v) if mm == m => v }
      vs.sum / vs.size
    }
    val methods = Seq("FCT", "RAND", "IMP", "SAFE")
    println()
    println(s"Mean JSD per method (paper means: FCT 0.4222, RAND 0.4104, IMP 0.4002, SAFE 0.3235):")
    methods.foreach(m => println(f"  $m%-5s ${meanOf(m)}%.4f"))

    assert(meanOf("SAFE") < meanOf("RAND"),
      f"SAFE ${meanOf("SAFE")}%.4f should be more stable than RAND ${meanOf("RAND")}%.4f")
    assert(meanOf("SAFE") < meanOf("IMP"),
      f"SAFE ${meanOf("SAFE")}%.4f should be more stable than IMP ${meanOf("IMP")}%.4f")
    // FCT stability is reported but not asserted: our FCTree keeps all M
    // originals in its output (stabilizing it), while the paper's FCT output
    // is dominated by run-varying constructed features — see EXPERIMENTS.md.
  }
}
