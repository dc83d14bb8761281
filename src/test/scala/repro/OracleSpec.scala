package repro

import org.apache.spark.sql.functions._

/** Self-test of the DuckDB oracle: it must accept equivalent results
  * and reject wrong rows, missing rows, and column mismatches.
  */
class OracleSpec extends SparkSpec {

  private def df = {
    import spark.implicits._
    Seq((1L, "a", 10.5), (2L, "b", 20.25)).toDF("k", "s", "v")
  }

  test("accepts an equivalent query") {
    Oracle.assertEquivalent(df, "SELECT k, s, v FROM t", "t" -> df)
  }

  test("accepts reordered rows and columns") {
    Oracle.assertEquivalent(df.orderBy(desc("k")).select("v", "k", "s"),
      "SELECT k, s, v FROM t", "t" -> df)
  }

  test("rejects wrong values") {
    val ex = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.withColumn("v", col("v") + 1),
        "SELECT k, s, v FROM t", "t" -> df)
    }
    assert(ex.getMessage.contains("result mismatch"))
  }

  test("rejects missing rows") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.limit(1), "SELECT k, s, v FROM t", "t" -> df)
    }
  }

  test("rejects column-name mismatches") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.withColumnRenamed("v", "x"),
        "SELECT k, s, v FROM t", "t" -> df)
    }
  }

  test("normalizes float formatting across engines") {
    import spark.implicits._
    val d = Seq((1L, 0.1 + 0.2)).toDF("k", "v") // 0.30000000000000004
    Oracle.assertEquivalent(d, "SELECT 1 AS k, 0.1 + 0.2 AS v")
  }
}
