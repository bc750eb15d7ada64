package repro.baselines

import repro.SparkSpec
import repro.core.{AggSpec, FilterOp, GroupByOp, JoinOp, Step}

class SeeDbSpec extends SparkSpec {
  import spark.implicits._

  private lazy val planted = {
    val rows = (1 to 300).map { i =>
      val cat = if (i % 5 == 0) "C" else if (i % 2 == 0) "A" else "B"
      val v   = if (cat == "C") 90.0 + i % 10 else (i % 80).toDouble
      (cat, v, (i % 3).toDouble)
    }
    rows.toDF("category", "value", "noise").cache()
  }

  test("recommend: the planted deviating dimension wins on a filter step") {
    val step  = Step(Seq(planted), FilterOp("value > 85"))
    val views = SeeDb.recommend(step, k = 3).get
    assert(views.nonEmpty)
    assert(views.head.dim === "category")
  }

  test("recommend: utilities are non-negative and sorted descending") {
    val step  = Step(Seq(planted), FilterOp("value > 85"))
    val views = SeeDb.recommend(step, k = 5).get
    assert(views.forall(_.utility >= 0))
    assert(views.map(_.utility) === views.map(_.utility).sortBy(-_))
  }

  test("recommend: not applicable to group-by steps (as in §4.2)") {
    val step = Step(Seq(planted), GroupByOp(Seq("category"), Seq(AggSpec("mean", "value", "m"))))
    assert(SeeDb.recommend(step) === None)
  }

  test("recommend: join steps compare against the left input") {
    val dim  = Seq((1, "x"), (2, "y"), (3, "z")).toDF("k", "name")
    val fact = Seq(1, 1, 1, 2).toDF("k")
    val step = Step(Seq(dim, fact), JoinOp("k", "k", "dim_", "fact_"))
    val views = SeeDb.recommend(step, k = 2).get
    assert(views.nonEmpty)
    assert(views.forall(_.dim.startsWith("dim_")))
  }

  test("recommend: a no-op filter produces ~zero utilities") {
    val step  = Step(Seq(planted), FilterOp("value >= -1"))
    val views = SeeDb.recommend(step, k = 3).get
    assert(views.forall(_.utility < 1e-9))
  }

  test("dimensions excludes constant and high-cardinality columns") {
    val df   = planted.withColumn("const", org.apache.spark.sql.functions.lit("z"))
      .withColumn("uid", org.apache.spark.sql.functions.monotonically_increasing_id())
    val dims = SeeDb.dimensions(df, maxDistinct = 60, maxDims = 10)
    assert(!dims.contains("const"))
    assert(!dims.contains("uid"))
    assert(dims.contains("category"))
  }

  test("measures picks the numeric columns") {
    val ms = SeeDb.measures(planted, 10)
    assert(ms.toSet === Set("value", "noise"))
  }

  test("view captions are well-formed") {
    val v = SeeDbView("category", "value", "avg", 0.1234)
    assert(v.caption.contains("category") && v.caption.contains("avg"))
  }
}

class RathSpec extends SparkSpec {
  import spark.implicits._

  test("outstanding insight: a planted group outlier is found") {
    val rows = (1 to 200).map { i =>
      val g = s"g${i % 5}"
      val v = if (g == "g3") 100.0 + i % 5 else 10.0 + i % 5
      (g, v)
    }
    val ins = Rath.topInsights(rows.toDF("grp", "value"), k = 3)
    assert(ins.nonEmpty)
    assert(ins.exists(i => i.kind == "outstanding" && i.subject.contains("g3")))
  }

  test("trend insight: monotone series along a numeric dimension scores ~1") {
    val rows = (1 to 100).map(i => (i % 10, (i % 10) * 5.0 + 1))
    val ins  = Rath.topInsights(rows.toDF("step", "value"), k = 3)
    assert(ins.exists(i => i.kind == "trend" && i.score > 0.95))
  }

  test("attribution insight: a dominant group is detected") {
    val rows = (1 to 100).map(i => (if (i <= 80) "big" else s"small${i % 4}", 1.0))
    val ins  = Rath.topInsights(rows.toDF("grp", "v"), k = 5)
    assert(ins.exists(i => i.kind == "attribution" && i.subject.contains("big")))
  }

  test("scores live in [0,1] and are sorted descending") {
    val rows = (1 to 150).map(i => (s"g${i % 6}", (i % 13).toDouble))
    val ins  = Rath.topInsights(rows.toDF("grp", "v"), k = 10)
    assert(ins.forall(i => i.score >= 0 && i.score <= 1))
    assert(ins.map(_.score) === ins.map(_.score).sortBy(-_))
  }

  test("uniform data yields only weak insights") {
    val rows = (1 to 100).map(i => (s"g${i % 4}", 5.0))
    val ins  = Rath.topInsights(rows.toDF("grp", "v"), k = 3)
    assert(ins.forall(_.score < 0.3), ins.mkString("; "))
  }

  test("insight captions are well-formed") {
    assert(RathInsight("outstanding", "d", "m", "d=g", 0.5).caption.contains("outstanding"))
    assert(RathInsight("trend", "d", "m", "d", 0.5).caption.contains("trend"))
  }
}

class IoSpec extends SparkSpec {
  import spark.implicits._

  test("IO ranks the planted deviating column first, but names no rows") {
    val rows = (1 to 300).map { i =>
      val cat = if (i % 5 == 0) "C" else "A"
      val v   = if (cat == "C") 90 + i % 10 else i % 80
      (cat, v, i % 3)
    }
    val din  = rows.toDF("category", "value", "noise").cache()
    val step = Step(Seq(din), FilterOp("value > 85"))
    val res  = InterestingnessOnly.explain(step, k = 3)
    assert(res.nonEmpty)
    assert(Seq("category", "value").contains(res.head.attr))
    assert(res.map(_.score) === res.map(_.score).sortBy(-_))
    assert(res.head.caption.contains(res.head.attr))
  }

  test("IO works on group-by steps via diversity") {
    val rows = (1 to 100).map(i => (s"g${i % 4}", if (i % 4 == 0) 100.0 else 1.0))
    val step = Step(Seq(rows.toDF("g", "v")),
      GroupByOp(Seq("g"), Seq(AggSpec("mean", "v", "mean_v"))))
    val res = InterestingnessOnly.explain(step, k = 2)
    assert(res.head.attr === "mean_v")
  }
}
