package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {
  import spark.implicits._

  test("identical aggregations pass") {
    val df = Seq((1, "a"), (2, "a"), (3, "b")).toDF("k", "g")
    Oracle.assertEquivalent(
      df.groupBy("g").agg(count(lit(1)).as("n")),
      "SELECT g, count(*) AS n FROM t GROUP BY g",
      "t" -> df,
    )
  }

  test("row mismatch is detected") {
    val df = Seq((1, "a"), (2, "b")).toDF("k", "g")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.groupBy("g").agg(count(lit(1)).as("n")),
        "SELECT g, count(*) + 1 AS n FROM t GROUP BY g",
        "t" -> df,
      )
    }
  }

  test("column-name mismatch is detected") {
    val df = Seq((1, "a")).toDF("k", "g")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select(col("k").as("wrongname")),
        "SELECT k FROM t",
        "t" -> df,
      )
    }
  }

  test("null values canonicalise consistently") {
    val df = Seq((Some(1), "a"), (None, "b")).toDF("k", "g")
    Oracle.assertEquivalent(
      df,
      "SELECT k, g FROM t",
      "t" -> df,
    )
  }

  test("doubles compare at 1e-6 canonical precision") {
    val df = Seq((1, 0.1), (2, 0.2)).toDF("k", "v")
    Oracle.assertEquivalent(
      df.groupBy().agg(sum("v").as("s")).select(round(col("s"), 4).as("s")),
      "SELECT ROUND(SUM(CAST(v AS DOUBLE)), 4) AS s FROM t",
      "t" -> df,
    )
  }
}
