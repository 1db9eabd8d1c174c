package repro

import org.apache.spark.sql.functions._

/** The DuckDB oracle itself: it must accept matching results and *reject*
  * mismatching ones — a silent oracle would invalidate every other check.
  */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    val d = Seq((1, 10), (2, 20), (3, 30), (4, 40)).toDF("k", "v").cache()
    d.count(); d
  }

  test("accepts an equivalent aggregate") {
    val got = df.agg(sum(col("v")).cast("double").as("s"))
    Oracle.assertEquivalent(got, "SELECT CAST(SUM(CAST(v AS INT)) AS DOUBLE) AS s FROM t", "t" -> df)
  }

  test("accepts equivalent multi-row results regardless of row order") {
    val got = df.select(col("k"), col("v")).orderBy(desc("k"))
    Oracle.assertEquivalent(got, "SELECT k, v FROM t", "t" -> df)
  }

  test("rejects a wrong value") {
    val wrong = df.agg((sum(col("v")) + 1).cast("double").as("s"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT CAST(SUM(CAST(v AS INT)) AS DOUBLE) AS s FROM t", "t" -> df)
    }
  }

  test("rejects a missing row") {
    val wrong = df.filter(col("k") =!= 3).select(col("k"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k FROM t", "t" -> df)
    }
  }

  test("rejects mismatched column names") {
    val got = df.agg(sum(col("v")).cast("double").as("total"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT CAST(SUM(CAST(v AS INT)) AS DOUBLE) AS s FROM t", "t" -> df)
    }
  }
}
