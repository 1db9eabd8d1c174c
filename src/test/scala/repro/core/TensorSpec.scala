package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, TestFixtures}
import repro.data.Datasets

/** Count-tensor construction (paper Figure 2) against the DuckDB oracle. */
class TensorSpec extends SparkSpec {

  private lazy val raw = TestFixtures.adultRawSmall
  private val dims = Datasets.adultDims.map(_.name)

  test("tensor matches DuckDB GROUP BY on all dimensions") {
    val tensor = Tensor.fromRows(raw, dims)
    val sql =
      s"""SELECT ${dims.map(d => s"CAST($d AS INTEGER) AS $d").mkString(", ")},
         |       CAST(COUNT(*) AS DOUBLE) AS ${Tensor.MeasureCol}
         |FROM raw GROUP BY ${dims.mkString(", ")}""".stripMargin
    Oracle.assertEquivalent(
      tensor.select(dims.map(col) :+ col(Tensor.MeasureCol).cast("double").as(Tensor.MeasureCol): _*),
      sql, "raw" -> raw)
  }

  test("tensor matches DuckDB GROUP BY on a dimension subset (aggregation away)") {
    val sub = Seq("age", "edu")
    val tensor = Tensor.fromRows(raw, sub)
    val sql =
      s"""SELECT CAST(age AS INTEGER) AS age, CAST(edu AS INTEGER) AS edu,
         |       CAST(COUNT(*) AS DOUBLE) AS ${Tensor.MeasureCol}
         |FROM raw GROUP BY age, edu""".stripMargin
    Oracle.assertEquivalent(
      tensor.select(col("age"), col("edu"),
        col(Tensor.MeasureCol).cast("double").as(Tensor.MeasureCol)),
      sql, "raw" -> raw)
  }

  test("measure column sums to the raw row count") {
    val tensor = Tensor.fromRows(raw, dims)
    val total = tensor.agg(sum(Tensor.MeasureCol)).head.getLong(0)
    assert(total == raw.count())
  }

  test("every measure is at least 1") {
    val tensor = Tensor.fromRows(raw, Seq("age", "workclass"))
    assert(tensor.filter(col(Tensor.MeasureCol) < 1).count() == 0)
  }

  test("dimension combinations are unique") {
    val tensor = Tensor.fromRows(raw, Seq("age", "edu"))
    assert(tensor.count() == tensor.select("age", "edu").distinct().count())
  }

  test("aggregating one dimension yields at most its domain size in rows") {
    val tensor = Tensor.fromRows(raw, Seq("workclass"))
    assert(tensor.count() <= Datasets.adultDims.find(_.name == "workclass").get.size)
  }

  test("empty dimension list is rejected") {
    intercept[IllegalArgumentException](Tensor.fromRows(raw, Seq.empty))
  }
}
