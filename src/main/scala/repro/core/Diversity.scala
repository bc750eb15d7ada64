package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Diversity interestingness (paper Eq. 2): the coefficient of variation
  * CV = s / |mean| of the aggregated values of a group-by output column.
  * Degenerate inputs (fewer than two values, zero mean) score 0 — a column
  * without dispersion is, by this measure, not interesting.
  */
object Diversity {

  /** CV of an in-memory value sequence (driver-side; used by the contribution
    * fast path where group aggregates are reconstructed per exclusion).
    */
  def cv(values: Iterable[Double]): Double = {
    val xs = values.iterator.filterNot(v => v.isNaN || v.isInfinite).toIndexedSeq
    val n  = xs.size
    if (n < 2) return 0.0
    val mean = xs.sum / n
    if (mean == 0.0) return 0.0
    val ss = xs.foldLeft(0.0)((acc, x) => acc + (x - mean) * (x - mean))
    math.sqrt(ss / (n - 1)) / math.abs(mean)
  }

  /** CV of a dataframe column via one Spark aggregation. */
  def cv(df: DataFrame, column: String): Double = {
    val r = df
      .select(col(column).cast("double").as("__v")).na.drop()
      .agg(avg("__v").as("m"), stddev_samp("__v").as("s"), count("__v").as("n"))
      .head()
    if (r.isNullAt(0) || r.isNullAt(1) || r.getLong(2) < 2) 0.0
    else {
      val m = r.getDouble(0)
      val s = r.getDouble(1)
      if (m == 0.0 || s.isNaN) 0.0 else s / math.abs(m)
    }
  }
}
