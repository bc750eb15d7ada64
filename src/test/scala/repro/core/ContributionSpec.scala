package repro.core

import repro.SparkSpec
import org.apache.spark.sql.functions._

class ContributionSpec extends SparkSpec {
  import spark.implicits._

  private def freqPartitionOn(df: org.apache.spark.sql.DataFrame, attr: String, n: Int) =
    Partition.frequency(df, attr, n)

  // ------------------------------------------- paper §3.3 worked examples

  test("paper example: contribution of (x,2) to sum group-by diversity is negative") {
    // d_in = {(x,1),(x,2),(y,3)} ; removing (x,2): d_out {(x,1),(y,3)} has CV>0 vs 0
    val din  = Seq(("x", 1), ("x", 2), ("y", 3)).toDF("a", "b")
    val step = Step(Seq(din), GroupByOp(Seq("a"), Seq(AggSpec("sum", "b", "sum_b"))))
    val p    = freqPartitionOn(din, "b", 3) // singleton sets per b value
    val res  = Contribution.all(step, "sum_b", p).get
    assert(res.full === 0.0) // {(x,3),(y,3)} is perfectly uniform
    assert(res.perSet("2") < 0.0)
  }

  test("paper example: contribution of one (x,1) to sum group-by diversity is positive") {
    // d_in = {(x,1),(x,1),(y,1)} with row ids so singleton sets are expressible
    val din  = Seq((0, "x", 1), (1, "x", 1), (2, "y", 1)).toDF("id", "a", "b")
    val step = Step(Seq(din), GroupByOp(Seq("a"), Seq(AggSpec("sum", "b", "sum_b"))))
    val p    = freqPartitionOn(din, "id", 3)
    val res  = Contribution.all(step, "sum_b", p).get
    assert(res.full > 0.0) // {(x,2),(y,1)} is diverse
    assert(res.perSet("0") > 0.0) // removing one (x,1) → {(x,1),(y,1)}, CV 0
    assert(res.perSet("1") > 0.0) // symmetric to id 0
  }

  test("filter contribution: the planted dominant set has the top contribution") {
    val rows = (1 to 300).map { i =>
      val cat = if (i % 5 == 0) "C" else if (i % 2 == 0) "A" else "B"
      val v   = if (cat == "C") 90 + i % 10 else i % 80
      (cat, v)
    }
    val din  = rows.toDF("category", "value").cache()
    val step = Step(Seq(din), FilterOp("value > 85"))
    val p    = freqPartitionOn(din, "category", 3)
    val res  = Contribution.all(step, "category", p).get
    assert(res.perSet("C") === res.perSet.values.max)
    assert(res.perSet("C") > 0)
  }

  // ----------------------------------------------- fast path == exact path

  private lazy val planted = {
    val rows = (1 to 240).map { i =>
      val cat = if (i % 6 == 0) "C" else if (i % 2 == 0) "A" else "B"
      val dec = if (i % 3 == 0) "1990s" else "2000s"
      val v   = (if (cat == "C") 80 + i % 20 else i % 70).toDouble
      (i, cat, dec, v)
    }
    rows.toDF("id", "category", "decade", "value").cache()
  }

  private def assertFastMatchesExact(step: Step, attr: String, p: RowPartition,
                                     labeledIdx: Int = 0): Unit = {
    val fast = Contribution.all(step, attr, p, labeledIdx).get
    p.sets.foreach { s =>
      val exact = Contribution.exact(step, attr, p, s, labeledIdx).get
      val f     = fast.perSet.getOrElse(s, fast.full) // sets absent from cells contribute full-I(full)=0... assert presence below
      assert(fast.perSet.contains(s), s"fast path lost set $s")
      assert(math.abs(f - exact) < 1e-9, s"set=$s fast=$f exact=$exact")
    }
  }

  test("fast == exact: filter step, frequency partition") {
    val step = Step(Seq(planted), FilterOp("value > 60"))
    assertFastMatchesExact(step, "category", freqPartitionOn(planted, "category", 3))
  }

  test("fast == exact: filter step, numeric partition on another column") {
    val step = Step(Seq(planted), FilterOp("value > 60"))
    assertFastMatchesExact(step, "value", Partition.numericBins(planted, "value", 4))
  }

  test("fast == exact: group-by mean") {
    val step = Step(Seq(planted), GroupByOp(Seq("category"), Seq(AggSpec("mean", "value", "m"))))
    assertFastMatchesExact(step, "m", freqPartitionOn(planted, "decade", 2))
  }

  test("fast == exact: group-by sum / count(*) / count(col)") {
    val gb = GroupByOp(Seq("category"), Seq(
      AggSpec("sum", "value", "s"), AggSpec("count", "*", "c"), AggSpec("count", "value", "cv")))
    val step = Step(Seq(planted), gb)
    val p    = freqPartitionOn(planted, "decade", 2)
    Seq("s", "c", "cv").foreach(assertFastMatchesExact(step, _, p))
  }

  test("fast == exact: group-by max and min") {
    val gb   = GroupByOp(Seq("category"), Seq(AggSpec("max", "value", "mx"), AggSpec("min", "value", "mn")))
    val step = Step(Seq(planted), gb)
    val p    = freqPartitionOn(planted, "decade", 2)
    Seq("mx", "mn").foreach(assertFastMatchesExact(step, _, p))
  }

  test("fast == exact: group-by numeric key column") {
    val din  = planted.withColumn("bucket", (col("id") % 4).cast("int"))
    val step = Step(Seq(din), GroupByOp(Seq("bucket"), Seq(AggSpec("mean", "value", "m"))))
    assertFastMatchesExact(step, "bucket", freqPartitionOn(din, "category", 3))
  }

  test("fast == exact: join step, partition on the dimension side") {
    val dim  = Seq((1, "x"), (2, "y"), (3, "z"), (4, "x")).toDF("k", "name")
    val fact = Seq(1, 1, 2, 3, 3, 3, 4).toDF("k")
    val step = Step(Seq(dim, fact), JoinOp("k", "k", "dim_", "fact_"))
    val p    = freqPartitionOn(dim, "name", 3)
    assertFastMatchesExact(step, "dim_name", p, labeledIdx = 0)
  }

  test("fast == exact: join step, attribute owned by the NON-partitioned side") {
    val dim  = Seq((1, "x"), (2, "y"), (3, "z")).toDF("k", "name")
    val fact = Seq((1, 10.0), (1, 20.0), (2, 10.0), (3, 30.0)).toDF("k", "amt")
    val step = Step(Seq(dim, fact), JoinOp("k", "k", "dim_", "fact_"))
    val p    = freqPartitionOn(dim, "name", 3)
    assertFastMatchesExact(step, "fact_amt", p, labeledIdx = 0)
  }

  test("fast == exact: union step") {
    val a    = Seq(("p", 1), ("p", 2), ("q", 3), ("q", 4)).toDF("c", "v")
    val b    = Seq(("p", 9), ("r", 9), ("r", 8)).toDF("c", "v")
    val step = Step(Seq(a, b), UnionOp())
    val p    = freqPartitionOn(a, "c", 2)
    assertFastMatchesExact(step, "v", p, labeledIdx = 0)
    assertFastMatchesExact(step, "c", p, labeledIdx = 0)
  }

  // --------------------------------------------------------- standardized

  test("standardized contribution centres and scales within the partition") {
    val r = ContributionResult(0.5, Map("a" -> 0.3, "b" -> 0.1, "c" -> -0.1), Map.empty)
    val s = r.standardized
    assert(math.abs(s.values.sum) < 1e-12) // mean 0
    assert(s("a") > s("b") && s("b") > s("c"))
    val sd = math.sqrt(Seq(0.3, 0.1, -0.1).map(v => math.pow(v - 0.1, 2)).sum / 2)
    assert(math.abs(s("a") - 0.2 / sd) < 1e-12)
  }

  test("standardized contribution with a single set or zero variance is 0") {
    assert(ContributionResult(0.1, Map("a" -> 0.4), Map.empty).standardized("a") === 0.0)
    val r = ContributionResult(0.1, Map("a" -> 0.2, "b" -> 0.2), Map.empty)
    assert(r.standardized.values.forall(_ === 0.0))
  }

  // -------------------------------------------------------------- stats

  test("exceptionality stats carry input/output shares for captions") {
    val din  = Seq(("A", 10), ("A", 90), ("B", 95), ("B", 96)).toDF("c", "v")
    val step = Step(Seq(din), FilterOp("v > 50"))
    val res  = Contribution.all(step, "c", freqPartitionOn(din, "c", 2)).get
    assert(math.abs(res.stats("A").inShare.get - 0.5) < 1e-12)
    assert(math.abs(res.stats("A").outShare.get - (1.0 / 3)) < 1e-12)
    assert(math.abs(res.stats("B").outShare.get - (2.0 / 3)) < 1e-12)
  }

  test("diversity stats carry set means and the overall mean/sd") {
    val din  = Seq(("g1", "X", 10.0), ("g2", "X", 12.0), ("g3", "Y", 50.0)).toDF("g", "s", "v")
    val step = Step(Seq(din), GroupByOp(Seq("g"), Seq(AggSpec("mean", "v", "m"))))
    val res  = Contribution.all(step, "m", freqPartitionOn(din, "s", 2)).get
    assert(math.abs(res.stats("X").setMean.get - 11.0) < 1e-12)
    assert(math.abs(res.stats("Y").setMean.get - 50.0) < 1e-12)
    assert(math.abs(res.stats("X").overallMean.get - 24.0) < 1e-12)
  }

  test("ignore-set rows are never a set but still count in the full score") {
    val din  = Seq(("A", 1), ("A", 99), ("B", 99), ("rare", 99)).toDF("c", "v")
    val step = Step(Seq(din), FilterOp("v > 50"))
    val p    = freqPartitionOn(din, "c", 2) // 'rare' → ignore set
    val res  = Contribution.all(step, "c", p).get
    assert(!res.perSet.keySet.exists(_ == "rare") || p.sets.contains("rare"))
    val exactFull = Interestingness.score(step, "c").get
    assert(math.abs(res.full - exactFull) < 1e-9)
  }
}
