package repro.core

import repro.SparkSpec
import org.apache.spark.sql.functions._

class PartitionSpec extends SparkSpec {
  import spark.implicits._

  // years repeat with conflicting genres so year→genre is NOT functional
  private lazy val songs = Seq(
    (1991, "1990s", "rock"), (1991, "1990s", "pop"), (1995, "1990s", "pop"),
    (2001, "2000s", "pop"), (2005, "2000s", "pop"),
    (2011, "2010s", "pop"), (2011, "2010s", "rock"), (2013, "2010s", "pop"),
    (2014, "2010s", "pop"), (2015, "2010s", "pop")
  ).toDF("year", "decade", "genre").cache()

  // -------------------------------------------------------------- frequency

  test("frequency: top-n most frequent values become the sets") {
    val p = Partition.frequency(songs, "decade", 2)
    assert(p.sets.toSet === Set("2010s", "1990s")) // counts 5 and 3
    assert(p.method === "frequency")
    assert(p.labelAttr === "decade")
  }

  test("frequency: remaining rows go to the ignore set (null label)") {
    val p = Partition.frequency(songs, "decade", 2)
    val ignored = p.labeled.where(col(Partition.LabelCol).isNull).count()
    assert(ignored === 2) // the 2000s rows
  }

  test("frequency: labels partition the rows disjointly and cover everything") {
    val p   = Partition.frequency(songs, "decade", 2)
    val tot = p.labeled.count()
    val perSet = p.sets.map(s => p.labeled.where(col(Partition.LabelCol) === s).count()).sum
    val ignore = p.labeled.where(col(Partition.LabelCol).isNull).count()
    assert(perSet + ignore === tot)
  }

  test("frequency: n larger than the domain keeps all values, empty ignore set") {
    val p = Partition.frequency(songs, "decade", 10)
    assert(p.sets.toSet === Set("1990s", "2000s", "2010s"))
    assert(p.labeled.where(col(Partition.LabelCol).isNull).count() === 0)
  }

  test("frequency: null attribute values always land in the ignore set") {
    val df = Seq(Some("a"), Some("a"), None).toDF("v")
    val p  = Partition.frequency(df, "v", 5)
    assert(p.sets === Seq("a"))
    assert(p.labeled.where(col(Partition.LabelCol).isNull).count() === 1)
  }

  test("frequency: deterministic tie-break by value") {
    val df = Seq("b", "a").toDF("v") // both frequency 1
    val p  = Partition.frequency(df, "v", 1)
    assert(p.sets === Seq("a"))
  }

  test("frequency: works on numeric columns via string labels") {
    val p = Partition.frequency(songs, "year", 3)
    assert(p.sets.size === 3)
    assert(p.labeled.columns.contains(Partition.LabelCol))
  }

  // ---------------------------------------------------------------- numeric

  test("numericBins: equal-frequency bins have near-equal counts") {
    val df = spark.range(1000).selectExpr("cast(id as double) as v")
    val p  = Partition.numericBins(df, "v", 4)
    assert(p.sets.size === 4)
    val counts = p.sets.map(s => p.labeled.where(col(Partition.LabelCol) === s).count())
    assert(counts.forall(c => math.abs(c - 250L) <= 30), counts.toString)
  }

  test("numericBins: every non-null row is labeled (empty ignore set)") {
    val df = spark.range(100).selectExpr("cast(id as double) as v")
    val p  = Partition.numericBins(df, "v", 5)
    assert(p.labeled.where(col(Partition.LabelCol).isNull).count() === 0)
  }

  test("numericBins: interval labels carry the end values (§3.7 labeling)") {
    val df = spark.range(100).selectExpr("cast(id as double) as v")
    val p  = Partition.numericBins(df, "v", 2)
    assert(p.sets.forall(s => s.startsWith("[") && s.endsWith("]") && s.contains(",")))
  }

  test("numericBins: constant column collapses to a single bin") {
    val df = Seq(5.0, 5.0, 5.0).toDF("v")
    val p  = Partition.numericBins(df, "v", 4)
    assert(p.sets.size === 1)
    assert(p.labeled.where(col(Partition.LabelCol).isNotNull).count() === 3)
  }

  test("numericBins: skewed column may collapse duplicate boundaries") {
    val df = (Seq.fill(95)(1.0) ++ Seq(2.0, 3.0, 4.0, 5.0, 6.0)).toDF("v")
    val p  = Partition.numericBins(df, "v", 10)
    assert(p.sets.size < 10)
    assert(p.sets.nonEmpty)
  }

  test("numericBins rejects non-numeric columns") {
    intercept[IllegalArgumentException] {
      Partition.numericBins(songs, "decade", 3)
    }
  }

  test("numericBins: null values land in the ignore set") {
    val df = Seq(Some(1.0), Some(2.0), Some(3.0), None).toDF("v")
    val p  = Partition.numericBins(df, "v", 2)
    assert(p.labeled.where(col(Partition.LabelCol).isNull).count() === 1)
  }

  // ------------------------------------------------------------ many-to-one

  test("manyToOneTargets: year → decade is detected") {
    assert(Partition.manyToOneTargets(songs, "year").contains("decade"))
  }

  test("manyToOneTargets: decade → year is NOT a many-to-one target (finer, violates FD)") {
    assert(!Partition.manyToOneTargets(songs, "decade").contains("year"))
  }

  test("manyToOneTargets: non-functionally-determined columns are rejected") {
    // genre is not determined by year's decade nor vice versa in this data
    assert(!Partition.manyToOneTargets(songs, "year").contains("genre"))
  }

  test("manyToOneTargets: condition 2 — constant columns (single value) are rejected") {
    val df = songs.withColumn("const", lit("x"))
    assert(!Partition.manyToOneTargets(df, "year").contains("const"))
  }

  test("manyToOneTargets: equal-cardinality bijections are rejected (not strictly coarser)") {
    val df = songs.withColumn("year_copy", col("year") + 10000)
    assert(!Partition.manyToOneTargets(df, "year").contains("year_copy"))
  }

  test("manyToOneTargets: maxLabelValues prunes high-cardinality targets") {
    assert(!Partition.manyToOneTargets(songs, "year", maxLabelValues = 2).contains("decade"))
  }

  test("manyToOne: partition labels come from the coarser column B") {
    val ps = Partition.manyToOne(songs, "year", 5)
    val byDecade = ps.find(_.via.contains("decade"))
    assert(byDecade.isDefined)
    assert(byDecade.get.sets.toSet === Set("1990s", "2000s", "2010s"))
    assert(byDecade.get.labelAttr === "decade")
    assert(byDecade.get.attr === "year")
  }

  test("manyToOne partition still respects Def 3.8 (disjoint cover)") {
    val p   = Partition.manyToOne(songs, "year", 5).find(_.via.contains("decade")).get
    val tot = p.labeled.count()
    val perSet = p.sets.map(s => p.labeled.where(col(Partition.LabelCol) === s).count()).sum
    assert(perSet === tot)
  }

  // --------------------------------------------------------------- bundling

  test("candidates: always includes the frequency partition") {
    val cs = Partition.candidates(songs, "decade", 2)
    assert(cs.exists(_.method === "frequency"))
  }

  test("candidates: numeric binning added for numeric columns with enough distinct values") {
    val cs = Partition.candidates(songs, "year", 3)
    assert(cs.exists(_.method === "numeric"))
  }

  test("candidates: numeric binning skipped when frequency already enumerates the domain") {
    val cs = Partition.candidates(songs, "year", 50)
    assert(!cs.exists(_.method === "numeric"))
  }

  test("candidates: many-to-one can be disabled") {
    val cs = Partition.candidates(songs, "year", 3, enableManyToOne = false)
    assert(!cs.exists(_.method === "many-to-one"))
  }

  test("candidates: many-to-one included when present") {
    val cs = Partition.candidates(songs, "year", 3)
    assert(cs.exists(p => p.method === "many-to-one" && p.via.contains("decade")))
  }
}
