package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Count-tensor construction (paper §3, Figure 2).
  *
  * A tabular table `T` over discrete dimensions is transformed into a
  * multidimensional count tensor `T^a`: one row per distinct combination of
  * the aggregated dimensions `D^a`, with a `Measure` column counting how
  * many raw rows collapsed into it.
  */
object Tensor {
  /** Name of the tensor's measure column. */
  val MeasureCol: String = "measure"

  /** Build the count tensor of `raw` over `dims` (all other columns are
    * aggregated away). Dimension columns must be integer-valued.
    */
  def fromRows(raw: DataFrame, dims: Seq[String]): DataFrame = {
    require(dims.nonEmpty, "tensor needs at least one dimension")
    raw
      .groupBy(dims.map(col): _*)
      .agg(count(lit(1)).cast("long").as(MeasureCol))
  }
}
