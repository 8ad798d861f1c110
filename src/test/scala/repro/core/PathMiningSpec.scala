package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.ml.{Gbdt, GbdtParams, LocalMatrix, TreePath}

class PathMiningSpec extends AnyFunSuite {

  test("combosFromPaths enumerates singles and pairs from one path") {
    val names = Array("a", "b", "c")
    val p = TreePath(Array(0, 1), Map(0 -> Array(1.0), 1 -> Array(2.0)))
    val both = PathMining.combosFromPaths(Array(p), names, includeSingles = true, includePairs = true)
    val keys = both.map(_.key).toSet
    assert(keys == Set(Seq("a"), Seq("b"), Seq("a", "b")))
    val pairsOnly = PathMining.combosFromPaths(Array(p), names, includeSingles = false, includePairs = true)
    assert(pairsOnly.map(_.key).toSet == Set(Seq("a", "b")))
  }

  test("combosFromPaths merges split values of repeated combinations") {
    val names = Array("a", "b")
    val p1 = TreePath(Array(0, 1), Map(0 -> Array(1.0), 1 -> Array(2.0)))
    val p2 = TreePath(Array(1, 0), Map(0 -> Array(3.0), 1 -> Array(2.0)))
    val combos = PathMining.combosFromPaths(Array(p1, p2), names, includeSingles = false, includePairs = true)
    assert(combos.length == 1)
    val c = combos.head
    assert(c.splitValues("a").sameElements(Array(1.0, 3.0)))
    assert(c.splitValues("b").sameElements(Array(2.0)))
  }

  test("combosFromPaths: pairs require co-occurrence on the same path") {
    val names = Array("a", "b", "c")
    val p1 = TreePath(Array(0), Map(0 -> Array(1.0)))
    val p2 = TreePath(Array(1), Map(1 -> Array(2.0)))
    val combos = PathMining.combosFromPaths(Array(p1, p2), names, includeSingles = false, includePairs = true)
    assert(combos.isEmpty) // a and b never share a path
  }

  test("gainRatio of a perfectly separating single split is high") {
    // y = 1 iff a > 0; split value 0 separates perfectly
    val n = 200
    val x = Array.tabulate(n)(i => Array(if (i % 2 == 0) -1.0 else 1.0))
    val y = x.map(r => if (r(0) > 0) 1.0 else 0.0)
    val m = LocalMatrix(Array("a"), x, y)
    val combo = PathMining.Combo(Seq("a"), Map("a" -> Array(0.0)))
    val gr = PathMining.gainRatio(m, combo)
    assert(gr > 0.99, s"gr=$gr") // IG = H(y) = ln2, splitInfo = ln2 → ratio 1
  }

  test("gainRatio of an uninformative split is near zero") {
    val rng = new scala.util.Random(1)
    val x = Array.fill(400)(Array(rng.nextGaussian()))
    val y = Array.fill(400)(if (rng.nextBoolean()) 1.0 else 0.0)
    val m = LocalMatrix(Array("a"), x, y)
    val combo = PathMining.Combo(Seq("a"), Map("a" -> Array(0.0)))
    assert(PathMining.gainRatio(m, combo) < 0.05)
  }

  test("gainRatio with empty split values is zero (degenerate partition)") {
    val m = LocalMatrix(Array("a"), Array(Array(1.0), Array(2.0)), Array(0.0, 1.0))
    val combo = PathMining.Combo(Seq("a"), Map("a" -> Array.empty[Double]))
    assert(PathMining.gainRatio(m, combo) == 0.0)
  }

  test("gainRatio of the XOR pair dominates the noise pair") {
    val m = TestData.xor(600, seed = 41)
    val xorCombo = PathMining.Combo(Seq("x0", "x1"), Map("x0" -> Array(0.0), "x1" -> Array(0.0)))
    val noiseCombo = PathMining.Combo(Seq("x0", "x2"), Map("x0" -> Array(0.0), "x2" -> Array(0.0)))
    val grXor = PathMining.gainRatio(m, xorCombo)
    val grNoise = PathMining.gainRatio(m, noiseCombo)
    assert(grXor > grNoise * 2, s"xor=$grXor noise=$grNoise")
  }

  test("hand-computed gain ratio for a 2x2 partition") {
    // 4 rows: (a,b) in {(-1,-1),(-1,1),(1,-1),(1,1)}, y = XOR of signs
    val x = Array(Array(-1.0, -1.0), Array(-1.0, 1.0), Array(1.0, -1.0), Array(1.0, 1.0))
    val y = Array(0.0, 1.0, 1.0, 0.0)
    val m = LocalMatrix(Array("a", "b"), x, y)
    val combo = PathMining.Combo(Seq("a", "b"), Map("a" -> Array(0.0), "b" -> Array(0.0)))
    // cells perfectly pure: IG = ln 2; splitInfo = ln 4 → ratio = 0.5
    assert(math.abs(PathMining.gainRatio(m, combo) - 0.5) < 1e-9)
  }

  test("topCombos on XOR surfaces the interacting pair first") {
    val m = TestData.xor(600, seed = 42)
    val model = Gbdt.fit(m, GbdtParams(numTrees = 15, maxDepth = 3))
    val top = PathMining.topCombos(model, m, gamma = 3, includeSingles = false, includePairs = true)
    assert(top.nonEmpty)
    assert(top.head.combo.key == Seq("x0", "x1"), s"top=${top.map(_.combo.key)}")
  }

  test("topCombos respects gamma") {
    val m = TestData.planted(400, 6, seed = 43)
    val model = Gbdt.fit(m, GbdtParams(numTrees = 15, maxDepth = 3))
    val top = PathMining.topCombos(model, m, gamma = 2, includeSingles = true, includePairs = true)
    assert(top.length <= 2)
  }

  test("topCombos is deterministic") {
    val m = TestData.planted(400, 6, seed = 44)
    val model = Gbdt.fit(m, GbdtParams(numTrees = 10))
    val a = PathMining.topCombos(model, m, 5, includeSingles = false, includePairs = true)
    val b = PathMining.topCombos(model, m, 5, includeSingles = false, includePairs = true)
    assert(a.map(_.combo.key) == b.map(_.combo.key))
  }
}
