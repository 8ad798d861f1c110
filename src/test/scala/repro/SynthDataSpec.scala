package repro

import org.apache.spark.sql.functions._

/** Sanity checks for the provided TPC-H-lite generators that oracle tests
  * depend on (deterministic in (sf, seed); sane key ranges).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.0005).count() == 3000)
    assert(SynthData.lineitem(spark, sf = 0.00001).count() == 60)
  }

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0002).agg(sum("l_quantity")).head.getDouble(0)
    val b = SynthData.lineitem(spark, 0.0002).agg(sum("l_quantity")).head.getDouble(0)
    assert(a == b)
  }

  test("lineitem keys stay within the scaled dimension tables") {
    val li = SynthData.lineitem(spark, 0.001)
    val maxOrder = li.agg(max("l_orderkey")).head.getLong(0)
    val maxPart = li.agg(max("l_partkey")).head.getLong(0)
    assert(maxOrder <= 1500 + 1)
    assert(maxPart <= 200 + 1)
  }

  test("orders keys are unique and sequential") {
    val o = SynthData.orders(spark, 0.001)
    assert(o.count() == o.select("o_orderkey").distinct.count())
  }

  test("customer and part have expected columns") {
    assert(SynthData.customer(spark, 0.001).columns.toSet ==
      Set("c_custkey", "c_nationkey", "c_acctbal", "c_mktsegment"))
    assert(SynthData.part(spark, 0.001).columns.toSet ==
      Set("p_partkey", "p_type", "p_size", "p_retailprice"))
  }

  test("zipfKeys is skewed: top key dominates uniform share") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val topCount = z.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(topCount > 20000 / 100 * 5, s"top=$topCount") // >5x uniform share
  }

  test("uniformKeys covers the key range roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length >= 10)
    assert(counts.max < counts.min * 2, counts.mkString(","))
  }
}
