package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Aggregation kind of a range query (paper §3: COUNT(*) or SUM(Measure)).
  *
  * On the count tensor, `COUNT(*)` counts tensor rows while `SUM(Measure)`
  * counts the aggregated raw individuals. Both have per-individual global
  * sensitivity 1 on the un-estimated query.
  */
sealed trait Agg
object Agg {
  case object Count      extends Agg
  case object SumMeasure extends Agg
}

/** Closed interval `[lb, ub]` on one discrete, totally ordered dimension. */
final case class DimRange(dim: String, lb: Int, ub: Int) {
  require(lb <= ub, s"empty range on $dim: [$lb,$ub]")
}

/** A range aggregation query (paper §3):
  * `SELECT <agg> FROM T WHERE lb_d <= d <= ub_d for d in D^Q`.
  */
final case class RangeQuery(agg: Agg, ranges: Seq[DimRange]) {
  require(ranges.nonEmpty, "a range query needs at least one dimension")
  require(ranges.map(_.dim).distinct.size == ranges.size, "duplicate dimension in query")

  /** `|D^Q|` — the number of constrained dimensions. */
  def nDims: Int = ranges.size

  /** Spark filter predicate over the (tensor) DataFrame columns. */
  def predicate: Column =
    ranges.map(r => col(r.dim) >= r.lb && col(r.dim) <= r.ub).reduce(_ && _)

  /** Spark aggregate expression over the measure column. */
  def aggregate(measure: String = Tensor.MeasureCol): Column = agg match {
    case Agg.Count      => count(lit(1)).cast("double")
    case Agg.SumMeasure => coalesce(sum(col(measure)).cast("double"), lit(0.0))
  }

  /** Exact evaluation on a tensor DataFrame — the plain-text answer. */
  def evaluate(tensor: DataFrame): Double =
    tensor.filter(predicate).agg(aggregate().as("answer")).head.getDouble(0)

  /** SQL text for the DuckDB oracle. The oracle stores every column as
    * VARCHAR, so each compared/ summed column is cast explicitly.
    */
  def oracleSql(table: String, measure: String = Tensor.MeasureCol): String = {
    val where = ranges
      .map(r => s"CAST(${r.dim} AS INTEGER) BETWEEN ${r.lb} AND ${r.ub}")
      .mkString(" AND ")
    val sel = agg match {
      case Agg.Count      => "CAST(COUNT(*) AS DOUBLE)"
      case Agg.SumMeasure => s"COALESCE(CAST(SUM(CAST($measure AS DOUBLE)) AS DOUBLE), 0.0)"
    }
    s"SELECT $sel AS answer FROM $table WHERE $where"
  }
}
