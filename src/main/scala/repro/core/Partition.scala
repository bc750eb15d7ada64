package repro.core

import org.apache.spark.sql.{DataFrame}
import org.apache.spark.sql.functions._

/** A materialised row partition (paper Def. 3.8): the input dataframe plus a
  * label column, where rows labelled null form the ignore-set R̂.
  *
  * @param method  "frequency" | "numeric" | "many-to-one"
  * @param attr    the attribute the partition was requested for (A)
  * @param via     for many-to-one: the coarser attribute B actually labelled on
  * @param labeled input dataframe with [[Partition.LabelCol]] appended
  * @param sets    labels of the non-ignore sets-of-rows (distinct, non-null)
  */
final case class RowPartition(method: String, attr: String, via: Option[String],
                              labeled: DataFrame, sets: Seq[String]) {
  /** Attribute whose values name the sets (B for many-to-one, else A). */
  def labelAttr: String = via.getOrElse(attr)
  def describe: String  = via.fold(s"$method($attr)")(b => s"$method($attr via $b)")
}

/** The three partition methods of §3.5. All run as Spark aggregations to find
  * the set labels, then label rows with a plain column expression, so the
  * labelled dataframe stays lazy and re-usable across contribution passes.
  */
object Partition {

  /** Name of the synthetic label column added to partitioned inputs. */
  val LabelCol = "__fedex_set"

  /** Frequency-based partition: one set per top-`n` most frequent value of
    * `attr`; remaining rows (and nulls) fall into the ignore-set.
    */
  def frequency(df: DataFrame, attr: String, n: Int): RowPartition = {
    require(n >= 1, "need at least one set")
    val top = df.where(col(attr).isNotNull)
      .groupBy(col(attr).cast("string").as("__v")).count()
      .orderBy(desc("count"), asc("__v"))
      .limit(n).collect().map(_.getString(0)).toSeq
    val labelled =
      if (top.isEmpty) df.withColumn(LabelCol, lit(null).cast("string"))
      else df.withColumn(
        LabelCol,
        when(col(attr).cast("string").isin(top: _*), col(attr).cast("string")))
    RowPartition("frequency", attr, None, labelled, top)
  }

  /** Numeric equal-frequency binning: `n` sets covering value intervals of
    * `attr` that hold (approximately) equal row counts. The ignore-set is
    * empty apart from null values. Skewed columns may collapse to fewer bins
    * when quantile boundaries coincide.
    */
  def numericBins(df: DataFrame, attr: String, n: Int): RowPartition = {
    require(n >= 1, "need at least one bin")
    require(Ks.isNumeric(df, attr), s"numeric partition needs a numeric column, got $attr")
    val probs  = (1 until n).map(_.toDouble / n).toArray
    val named  = df.select(col(attr).cast("double").as("__v")).na.drop()
    val bounds =
      if (probs.isEmpty) Array.empty[Double]
      else named.stat.approxQuantile("__v", probs, 0.001).distinct.sorted
    val ext = named.agg(min("__v"), max("__v")).head()
    if (ext.isNullAt(0)) // all-null column: single empty partition
      return RowPartition("numeric", attr, None,
        df.withColumn(LabelCol, lit(null).cast("string")), Seq.empty)
    val lo = ext.getDouble(0); val hi = ext.getDouble(1)
    val edges = (lo +: bounds.toSeq :+ hi).distinct.sorted
    val labels =
      if (edges.size < 2) Seq(f"[$lo%.4g, $hi%.4g]")
      else edges.sliding(2).map(w => f"[${w.head}%.4g, ${w.last}%.4g]").toSeq
    val inner = edges.slice(1, edges.size - 1) // cut points between bins
    val v     = col(attr).cast("double")
    val expr0 = inner.zipWithIndex.foldLeft(when(v.isNull, lit(null).cast("string"))) {
      case (acc, (cut, i)) => acc.when(v <= cut, lit(labels(i)))
    }
    val labelled = df.withColumn(LabelCol, expr0.otherwise(lit(labels.last)))
    RowPartition("numeric", attr, None, labelled, labels)
  }

  /** Mine columns B with a many-to-one relationship from `attr` (§3.5):
    * (1) A functionally determines B and (2) B's partition is strictly
    * coarser. Candidates are pre-filtered to ≤ `maxLabelValues` distinct
    * values so the resulting explanation stays readable; FD checks for all
    * candidates run in a single aggregation pass.
    */
  def manyToOneTargets(df: DataFrame, attr: String, maxLabelValues: Long = 1000): Seq[String] = {
    val others = df.columns.filterNot(c => c == attr || c == LabelCol).toSeq
    if (others.isEmpty) return Seq.empty
    val cards = df.agg(
      approx_count_distinct(col(attr)).as(attr),
      others.map(c => approx_count_distinct(col(c)).as(c)): _*
    ).head()
    val cardA = cards.getLong(0)
    val pre = others.zipWithIndex.collect {
      case (c, i) if cards.getLong(i + 1) > 1 &&
        cards.getLong(i + 1) < cardA && cards.getLong(i + 1) <= maxLabelValues => c
    }
    if (pre.isEmpty) return Seq.empty
    // Condition 1 (FD A -> B) for all surviving candidates in one pass.
    val fd = df.where(col(attr).isNotNull)
      .groupBy(col(attr))
      .agg(countDistinct(col(pre.head)).as(pre.head),
           pre.tail.map(c => countDistinct(col(c)).as(c)): _*)
      .agg(max(col(pre.head)).as(pre.head), pre.tail.map(c => max(col(c)).as(c)): _*)
      .head()
    pre.zipWithIndex.collect { case (c, i) if fd.getLong(i) <= 1 => c }
  }

  /** Many-to-one partitions for `attr`: frequency partitions over each mined
    * coarser attribute B.
    */
  def manyToOne(df: DataFrame, attr: String, n: Int, maxLabelValues: Long = 1000): Seq[RowPartition] =
    manyToOneTargets(df, attr, maxLabelValues).map { b =>
      val p = frequency(df, b, n)
      RowPartition("many-to-one", attr, Some(b), p.labeled, p.sets)
    }

  /** All applicable partitions of `df` for explaining via `attr` with `n`
    * sets: frequency, numeric binning (numeric columns whose cardinality
    * exceeds `n` — below that, frequency already enumerates the values), and
    * many-to-one.
    */
  def candidates(df: DataFrame, attr: String, n: Int,
                 enableManyToOne: Boolean = true): Seq[RowPartition] =
    candidatesMulti(df, attr, Seq(n), enableManyToOne)

  /** As `candidates` for several set counts at once; the (expensive)
    * many-to-one FD mining runs a single time and is shared across all `ns`.
    */
  def candidatesMulti(df: DataFrame, attr: String, ns: Seq[Int],
                      enableManyToOne: Boolean = true): Seq[RowPartition] = {
    val m2oTargets = if (enableManyToOne) manyToOneTargets(df, attr) else Seq.empty
    ns.flatMap { n =>
      val freq = frequency(df, attr, n)
      val numeric =
        if (Ks.isNumeric(df, attr) && freq.sets.size >= n) Seq(numericBins(df, attr, n))
        else Seq.empty
      val m2o = m2oTargets.map { b =>
        val p = frequency(df, b, n)
        RowPartition("many-to-one", attr, Some(b), p.labeled, p.sets)
      }
      freq +: (numeric ++ m2o)
    }
  }
}
