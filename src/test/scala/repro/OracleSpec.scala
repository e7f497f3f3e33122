package repro

import org.apache.spark.sql.functions._

/** The oracle itself must fail loudly on wrong results — otherwise every
  * "oracle-checked" test in the repo is vacuous.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  private def df = Seq((1L, "a"), (2L, "b"), (2L, "c")).toDF("k", "v")

  test("accepts a correct aggregation") {
    val got = df.groupBy($"k").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
  }

  test("rejects a wrong row count") {
    val wrong = df.groupBy($"k").agg(count(lit(1)).as("n")).limit(1)
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("rejects a wrong value") {
    val wrong = df.groupBy($"k").agg((count(lit(1)) + 1).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("rejects mismatched output columns") {
    val wrong = df.groupBy($"k").agg(count(lit(1)).as("wrongname"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", "t" -> df)
    }
  }

  test("compares doubles with rounding tolerance") {
    val got = df.groupBy($"k").agg(avg(length($"v")).cast("double").as("m"))
    Oracle.assertEquivalent(got,
      "SELECT k, AVG(LENGTH(v)) AS m FROM t GROUP BY k", "t" -> df)
  }

  test("handles nulls") {
    val withNull = Seq((1L, Option("a")), (2L, None)).toDF("k", "v")
    val got = withNull.select($"k", $"v")
    Oracle.assertEquivalent(got, "SELECT k, v FROM t", "t" -> withNull)
  }
}
