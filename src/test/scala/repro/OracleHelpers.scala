package repro

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import org.apache.spark.sql.types.NumericType

/** Helpers for DuckDB oracle comparisons. The oracle stores input tables as
  * VARCHAR, so (a) numeric predicates/aggregates in the DuckDB SQL must cast
  * explicitly and (b) value-preserving comparisons are most robust with the
  * Spark side cast to string (both sides then carry the identical inserted
  * representation).
  */
object OracleHelpers {

  /** All columns of `df` cast to string (for row-preserving steps). */
  def stringified(df: DataFrame): DataFrame =
    df.select(df.columns.map(c => col(c).cast("string").as(c)).toSeq: _*)

  /** DuckDB select list reproducing `df`'s columns verbatim (VARCHAR). */
  def selectList(df: DataFrame): String = df.columns.map(q).mkString(", ")

  /** Quote a column name for DuckDB. */
  def q(c: String): String = s""""$c""""

  /** DuckDB expression casting a stored VARCHAR column to DOUBLE. */
  def num(c: String): String = s"CAST(${q(c)} AS DOUBLE)"

  def isNumeric(df: DataFrame, c: String): Boolean =
    df.schema(c).dataType.isInstanceOf[NumericType]
}
