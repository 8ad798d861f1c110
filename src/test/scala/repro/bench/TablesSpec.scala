package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.SynthClass

/** Cheap smoke tests of the table generators (the full grids run in the
  * bench subproject; here we only verify plumbing on tiny slices).
  */
class TablesSpec extends AnyFunSuite {

  private def collect(f: (String => Unit) => Any): Seq[String] = {
    val buf = scala.collection.mutable.ArrayBuffer.empty[String]
    f(buf += _)
    buf.toSeq
  }

  test("tableIV prints one row per benchmark dataset plus header") {
    val lines = collect(Tables.tableIV)
    assert(lines.count(_.contains("[")) == SynthClass.benchmarks.length)
    assert(lines.exists(_.contains("gina")))
    assert(lines.exists(_.contains("970 [50]"))) // cap is documented inline
  }

  test("tableVII prints the three business datasets with paper sizes") {
    val lines = collect(Tables.tableVII)
    assert(lines.exists(_.contains("Data3")))
    assert(lines.exists(_.contains("8000000")))
  }

  test("tableV on a single dataset returns all five methods") {
    val out = Tables.tableV(_ => (), datasets = SynthClass.benchmarks.take(1))
    assert(out.keySet.map(_._2) == Set("FCT", "TFC", "RAND", "IMP", "SAFE"))
    out.values.foreach(s => assert(s >= 0))
  }

  test("tableIII on one tiny dataset × one classifier produces sane cells") {
    val out = Tables.tableIII(_ => (),
      datasets = SynthClass.benchmarks.filter(_.name == "banknote"),
      clfs = Seq("LR"), nRepeats = 1)
    assert(out.keySet.map(_._3) == Harness.MethodNames.toSet)
    out.values.foreach(v => assert(v >= 0 && v <= 100))
  }

  test("tableVScaling returns times for each requested dimension") {
    val out = Tables.tableVScaling(_ => (), dims = Seq(6, 12), n = 400)
    assert(out.keySet.map(_._1) == Set(6, 12))
    out.values.foreach(s => assert(s >= 0))
  }

  test("repeat/stability knobs default correctly") {
    assert(Tables.repeats >= 1)
    assert(Tables.stabilityRuns >= 1)
  }
}
