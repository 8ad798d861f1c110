package repro

import org.apache.spark.sql.functions._

/** The oracle itself must fail loudly on wrong results — otherwise every
  * "matches DuckDB" test in this repo proves nothing.
  */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    Seq((1.0, 2.0), (3.0, 4.0), (5.0, 6.0)).toDF("a", "b")
  }

  test("accepts a correct aggregate") {
    Oracle.assertEquivalent(
      df.agg(sum(col("a").cast("double")).as("s")),
      "SELECT sum(CAST(a AS DOUBLE)) AS s FROM t",
      "t" -> df)
  }

  test("rejects a wrong result") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.agg((sum(col("a").cast("double")) + 1).as("s")),
        "SELECT sum(CAST(a AS DOUBLE)) AS s FROM t",
        "t" -> df)
    }
  }

  test("rejects mismatched output columns") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.agg(sum(col("a").cast("double")).as("wrong_name")),
        "SELECT sum(CAST(a AS DOUBLE)) AS s FROM t",
        "t" -> df)
    }
  }

  test("rejects a missing row") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select(col("a")).limit(2),
        "SELECT a FROM t",
        "t" -> df)
    }
  }
}
