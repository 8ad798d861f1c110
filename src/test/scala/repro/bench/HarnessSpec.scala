package repro.bench

import repro.{SparkSpec, TestData}
import repro.core.SafeConfig
import repro.ml.GbdtParams

class HarnessSpec extends SparkSpec {

  private lazy val train = TestData.planted(400, 5, seed = 71)
  private lazy val test = TestData.planted(200, 5, seed = 72)
  private val cfg = SafeConfig(gbdt = GbdtParams(numTrees = 8))

  test("all six methods produce plans within the 2M cap") {
    for (m <- Harness.MethodNames) {
      val (plan, secs) = Harness.runFE(m, train, seed = 1, cfg)
      assert(plan.width <= 2 * train.cols, s"$m width=${plan.width}")
      assert(secs >= 0)
    }
  }

  test("ORIG is the identity plan") {
    val (plan, _) = Harness.runFE("ORIG", train, 0, cfg)
    assert(plan.keep == train.names.toSeq)
    assert(plan.generated.isEmpty)
  }

  test("unknown method or classifier is rejected") {
    intercept[IllegalArgumentException](Harness.runFE("NOPE", train, 0, cfg))
    intercept[IllegalArgumentException](Harness.classifier("NOPE"))
  }

  test("the classifier registry covers the paper's nine models") {
    assert(Harness.classifiers.map(_._1) ==
      Seq("AB", "DT", "ET", "kNN", "LR", "MLP", "RF", "SVM", "XGB"))
  }

  test("evaluate returns 100xAUC per classifier in a sane range") {
    val (plan, _) = Harness.runFE("SAFE", train, 2, cfg)
    val scores = Harness.evaluate(plan, train, test, Seq("LR", "XGB", "DT"), seed = 0)
    assert(scores.keySet == Set("LR", "XGB", "DT"))
    scores.values.foreach(v => assert(v >= 0 && v <= 100))
    assert(scores("XGB") > 55) // planted structure is learnable
  }

  test("runDataset averages over repeats and reports every method") {
    val out = Harness.runDataset("banknote", Seq("ORIG", "SAFE"), Seq("XGB"), repeats = 1, cfg)
    assert(out.keySet == Set("ORIG", "SAFE"))
    assert(out("SAFE").contains("XGB"))
  }

  test("runFESpark supports the business methods") {
    val (plan, _) = Harness.runFESpark("SAFE", train, spark, seed = 1, cfg)
    assert(plan.keep.nonEmpty)
    intercept[IllegalArgumentException](Harness.runFESpark("TFC", train, spark, 0, cfg))
  }

  test("printTable aligns columns") {
    val lines = scala.collection.mutable.ArrayBuffer.empty[String]
    Harness.printTable(Seq("a", "bb"), Seq(Seq("xxx", "y")), lines += _)
    assert(lines.length == 3)
    assert(lines(0).length == lines(2).length)
  }
}

class StabilitySpec extends org.scalatest.funsuite.AnyFunSuite {

  test("perfectly stable runs score lower than unstable runs") {
    val stable = Seq.fill(10)(Seq("f1", "f2", "f3"))
    val unstable = (0 until 10).map(t => Seq(s"a$t", s"b$t", s"c$t"))
    val s = Stability.jsdScore(stable)
    val u = Stability.jsdScore(unstable)
    assert(s < u, s"stable=$s unstable=$u")
  }

  test("perfectly stable distribution has JSD 0") {
    assert(math.abs(Stability.jsdScore(Seq.fill(5)(Seq("x", "y")))) < 1e-9)
  }

  test("maximally unstable distribution approaches ln 2") {
    val runs = (0 until 50).map(t => Seq(s"f$t"))
    val v = Stability.jsdScore(runs)
    assert(v > 0.5 && v <= math.log(2) + 1e-9, s"v=$v")
  }

  test("partial overlap lands between the extremes") {
    val runs = (0 until 10).map(t => Seq("common1", "common2", s"varying$t"))
    val v = Stability.jsdScore(runs)
    assert(v > 0.0 && v < math.log(2))
  }

  test("measure drives the supplied FE function with distinct seeds") {
    val seeds = scala.collection.mutable.ArrayBuffer.empty[Long]
    Stability.measure(4, { s => seeds += s; Seq("f") })
    assert(seeds.toSeq == Seq(0L, 1L, 2L, 3L))
  }

  test("jsdScore requires at least one run") {
    intercept[IllegalArgumentException](Stability.jsdScore(Nil))
  }
}
