package repro

import org.apache.spark.sql.functions._

/** Sanity of the DuckDB oracle machinery itself. */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  test("matching aggregate passes") {
    val df = Seq((1.0, "a"), (2.0, "a"), (3.0, "b")).toDF("v", "g")
    val agg = df.groupBy("g").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(agg, "SELECT g, COUNT(*) AS cnt FROM t GROUP BY g", "t" -> df)
  }

  test("wrong result is detected") {
    val df = Seq((1.0, "a"), (2.0, "a"), (3.0, "b")).toDF("v", "g")
    val wrong = Seq(("a", 99L), ("b", 1L)).toDF("g", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT g, COUNT(*) AS cnt FROM t GROUP BY g", "t" -> df)
    }
  }

  test("column-set mismatch is detected") {
    val df = Seq((1.0, "a")).toDF("v", "g")
    val bad = Seq(("a", 1L)).toDF("wrongname", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(bad, "SELECT g, COUNT(*) AS cnt FROM t GROUP BY g", "t" -> df)
    }
  }

  test("doubles compare at 1e-6 canonical precision") {
    val df = Seq(1.0000001, 2.0).toDF("v")
    Oracle.assertEquivalent(
      df.agg(sum("v").as("s")),
      "SELECT SUM(CAST(v AS DOUBLE)) AS s FROM t", "t" -> df)
  }
}
