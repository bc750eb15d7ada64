package repro.core

import repro.{PropChecks, SparkSpec}
import org.scalacheck.{Gen, Prop}

class KsSpec extends SparkSpec with PropChecks {
  import spark.implicits._

  // ------------------------------------------------------------- fromCounts

  test("fromCounts: identical distributions score 0") {
    val c = Seq("a" -> 3L, "b" -> 2L)
    assert(Ks.fromCounts(c, c, numeric = false) === 0.0)
  }

  test("fromCounts: identical shape at different scale scores 0") {
    val a = Seq("a" -> 3L, "b" -> 3L)
    val b = Seq("a" -> 30L, "b" -> 30L)
    assert(math.abs(Ks.fromCounts(a, b, numeric = false)) < 1e-12)
  }

  test("fromCounts: disjoint supports score 1") {
    val a = Seq("1" -> 5L)
    val b = Seq("2" -> 5L)
    assert(Ks.fromCounts(a, b, numeric = true) === 1.0)
  }

  test("fromCounts: hand-computed overlap case") {
    // A: CDF at 1,2,3 = .5, 1, 1 ; B: 0, .5, 1 → sup diff .5
    val a = Seq("1" -> 1L, "2" -> 1L)
    val b = Seq("2" -> 1L, "3" -> 1L)
    assert(math.abs(Ks.fromCounts(a, b, numeric = true) - 0.5) < 1e-12)
  }

  test("fromCounts: numeric vs lexicographic ordering differ when keys demand it") {
    // numeric order: 2 < 10 ; lexicographic: "10" < "2"
    val a = Seq("2" -> 1L)
    val b = Seq("10" -> 1L)
    assert(Ks.fromCounts(a, b, numeric = true) === 1.0)
    assert(Ks.fromCounts(a, b, numeric = false) === 1.0)
    // mixed case where intermediate CDFs differ
    val c = Seq("2" -> 1L, "10" -> 1L)
    val d = Seq("10" -> 2L)
    // numeric: after 2 → |0.5-0|=.5 ; after 10 → 0. lexicographic: after "10" → |0.5-1|=.5
    assert(math.abs(Ks.fromCounts(c, d, numeric = true) - 0.5) < 1e-12)
    assert(math.abs(Ks.fromCounts(c, d, numeric = false) - 0.5) < 1e-12)
  }

  test("fromCounts: empty side scores 0") {
    assert(Ks.fromCounts(Nil, Seq("a" -> 1L), numeric = false) === 0.0)
    assert(Ks.fromCounts(Seq("a" -> 1L), Nil, numeric = false) === 0.0)
  }

  test("fromCounts: duplicate keys are summed") {
    val a = Seq("x" -> 1L, "x" -> 1L, "y" -> 2L)
    val b = Seq("x" -> 2L, "y" -> 2L)
    assert(Ks.fromCounts(a, b, numeric = false) === 0.0)
  }

  test("fromCounts is symmetric (property)") {
    val gen = Gen.nonEmptyListOf(Gen.zip(Gen.choose(0, 20).map(_.toString), Gen.choose(1L, 50L)))
    checkProp(Prop.forAll(gen, gen) { (a, b) =>
      math.abs(Ks.fromCounts(a, b, numeric = true) - Ks.fromCounts(b, a, numeric = true)) < 1e-12
    })
  }

  test("fromCounts stays in [0,1] (property)") {
    val gen = Gen.listOf(Gen.zip(Gen.choose(0, 30).map(_.toString), Gen.choose(1L, 100L)))
    checkProp(Prop.forAll(gen, gen) { (a, b) =>
      val d = Ks.fromCounts(a, b, numeric = false)
      d >= 0.0 && d <= 1.0
    })
  }

  test("fromCounts: triangle-ish monotonicity — moving mass increases distance") {
    val base = Seq("1" -> 10L, "2" -> 10L)
    val mild = Seq("1" -> 12L, "2" -> 8L)
    val wild = Seq("1" -> 19L, "2" -> 1L)
    val dMild = Ks.fromCounts(base, mild, numeric = true)
    val dWild = Ks.fromCounts(base, wild, numeric = true)
    assert(dWild > dMild)
  }

  // ------------------------------------------------------------- bucketing

  test("bucketOf assigns half-open buckets over boundaries") {
    val b = Array(1.0, 2.0, 3.0)
    assert(Ks.bucketOf(b)(0.5) === 0)
    assert(Ks.bucketOf(b)(1.0) === 0)
    assert(Ks.bucketOf(b)(1.5) === 1)
    assert(Ks.bucketOf(b)(3.0) === 2)
    assert(Ks.bucketOf(b)(99.0) === 3)
  }

  test("bucketOf with empty boundaries maps everything to 0") {
    assert(Ks.bucketOf(Array.empty[Double])(5.0) === 0)
  }

  test("boundaries are sorted and distinct") {
    val df = spark.range(1000).selectExpr("cast(id % 17 as double) as v")
    val b  = Ks.boundaries(df, "v", 8)
    assert(b.sameElements(b.sorted))
    assert(b.distinct.length === b.length)
  }

  // --------------------------------------------------------- statistic (DF)

  test("statistic: identical dataframes score 0") {
    val df = spark.range(100).selectExpr("id % 7 as v")
    assert(Ks.statistic(df, df, "v") === 0.0)
  }

  test("statistic: disjoint numeric ranges score 1") {
    val a = spark.range(50).selectExpr("id as v")
    val b = spark.range(100, 150).selectExpr("id as v")
    assert(Ks.statistic(a, b, "v") === 1.0)
  }

  test("statistic: matches fromCounts on a known example") {
    val a = Seq(1, 2).toDF("v")
    val b = Seq(2, 3).toDF("v")
    assert(math.abs(Ks.statistic(a, b, "v") - 0.5) < 1e-12)
  }

  test("statistic: string column, lexicographic order") {
    val a = Seq("apple", "banana").toDF("v")
    val b = Seq("banana", "cherry").toDF("v")
    assert(math.abs(Ks.statistic(a, b, "v") - 0.5) < 1e-12)
  }

  test("statistic: nulls are dropped on both sides") {
    val a = Seq(Some(1), Some(2), None).toDF("v")
    val b = Seq(Some(1), Some(2)).toDF("v")
    assert(Ks.statistic(a, b, "v") === 0.0)
  }

  test("statistic: filter shifting the distribution scores > 0") {
    val base = spark.range(1000).selectExpr("id % 10 as v")
    val filt = base.where("v >= 8")
    val d    = Ks.statistic(base, filt, "v")
    assert(d > 0.5)
  }

  test("statistic: binned path approximates the exact statistic") {
    val a = spark.range(20000).selectExpr("cast(id as double)/20000 as v")
    val b = spark.range(20000).selectExpr("pow(cast(id as double)/20000, 2.0) as v")
    val exact  = Ks.statistic(a, b, "v", maxBins = 100000)
    val binned = Ks.statistic(a, b, "v", maxBins = 128)
    assert(math.abs(exact - binned) < 0.05, s"exact=$exact binned=$binned")
  }

  test("statistic: statsFrom fixes the key space for sampled comparisons") {
    val base = spark.range(5000).selectExpr("cast(id as double) as v")
    val out  = base.where("v > 2500")
    val d1 = Ks.statistic(base, out, "v", maxBins = 64)
    val d2 = Ks.statistic(base, out, "v", maxBins = 64, statsFrom = Some(base))
    assert(math.abs(d1 - d2) < 1e-12)
  }

  test("isNumeric detects numeric and non-numeric columns") {
    val df = Seq((1, "a", 2.0)).toDF("i", "s", "d")
    assert(Ks.isNumeric(df, "i"))
    assert(Ks.isNumeric(df, "d"))
    assert(!Ks.isNumeric(df, "s"))
  }
}
