package repro

import org.apache.spark.sql.functions._

class OracleSelfSpec extends SparkSpec {
  import spark.implicits._

  test("oracle accepts an equivalent aggregation") {
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val agg = df.groupBy("k").agg(sum("v").as("s"))
    Oracle.assertEquivalent(agg,
      "SELECT k, SUM(CAST(v AS BIGINT)) AS s FROM t GROUP BY k", "t" -> df)
  }

  test("oracle rejects a wrong result") {
    val df = Seq(("a", 1), ("b", 3)).toDF("k", "v")
    val wrong = df.groupBy("k").agg((sum("v") + 1).as("s"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT k, SUM(CAST(v AS BIGINT)) AS s FROM t GROUP BY k", "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    val df = Seq(("a", 1)).toDF("k", "v")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select("k"), "SELECT v FROM t", "t" -> df)
    }
  }

  test("oracle handles nulls") {
    val df = Seq((Some("a"), 1), (None, 2)).toDF("k", "v")
    Oracle.assertEquivalent(df.select("k", "v"), "SELECT k, v FROM t", "t" -> df)
  }
}
