package repro.data

import repro.{Oracle, OracleHelpers, SparkSpec}
import repro.core.{Fedex, FedexConfig, GroupByOp}
import org.apache.spark.sql.functions._

class QueriesSpec extends SparkSpec {
  import OracleHelpers._

  private lazy val frames  = new Frames(spark, DataScale.Test)
  private lazy val queries = Queries.all(frames)

  test("all 30 queries of Tables 2 and 3 are defined") {
    assert(queries.map(_.num).sorted === (1 to 30))
  }

  test("query kinds match the paper: 3 joins, 12 filters, 15 group-bys") {
    assert(queries.count(_.kind == "join") === 3)
    assert(queries.count(_.kind == "filter") === 12)
    assert(queries.count(_.kind == "groupby") === 15)
  }

  test("every query executes and yields a non-empty schema") {
    queries.foreach { q =>
      assert(q.step.output.columns.nonEmpty, s"q${q.num}")
      assert(q.step.output.count() >= 0, s"q${q.num}")
    }
  }

  test("filter queries produce strict subsets at test scale") {
    queries.filter(_.kind == "filter").foreach { q =>
      val in  = q.step.inputs.head.count()
      val out = q.step.output.count()
      assert(out <= in, s"q${q.num}: out=$out in=$in")
      assert(out > 0, s"q${q.num} selected nothing — synthetic data too narrow")
    }
  }

  test("group-by queries aggregate to fewer rows than their input") {
    queries.filter(_.kind == "groupby").foreach { q =>
      assert(q.step.output.count() < q.step.inputs.head.count(), s"q${q.num}")
    }
  }

  test("q6 matches DuckDB (popularity filter)") {
    val q  = queries.find(_.num == 6).get
    val in = q.step.inputs.head
    Oracle.assertEquivalent(
      stringified(q.step.output),
      s"SELECT ${selectList(in)} FROM spotify WHERE ${num("popularity")} > 65",
      "spotify" -> in)
  }

  test("q15 matches DuckDB (string-equality filter with special characters)") {
    val bq = queries.find(_.num == 15).get
    val in = bq.step.inputs.head
    Oracle.assertEquivalent(
      stringified(bq.step.output),
      s"SELECT ${selectList(in)} FROM bank WHERE ${OracleHelpers.q("Income_Category")} = 'Less than $$40K'",
      "bank" -> in)
  }

  test("q21 matches DuckDB (popularity aggregates by year)") {
    // mean is checked as (sum, count) — rounding a mean can land exactly on a
    // .5 boundary where Spark (half-up) and DuckDB (half-even) disagree.
    val bq = queries.find(_.num == 21).get
    val in = bq.step.inputs.head
    val counts = in.groupBy(col("year").cast("string").as("year"))
      .agg(count(lit(1)).as("__n"))
    val got = bq.step.output.select(col("year").cast("string").as("year"),
      col("mean_popularity"), col("max_popularity"), col("min_popularity"))
      .join(counts, "year")
      .select(col("year"),
        round(col("mean_popularity") * col("__n"), 2).as("sum_popularity"),
        col("__n").cast("string").as("n"),
        round(col("max_popularity"), 4).as("max_popularity"),
        round(col("min_popularity"), 4).as("min_popularity"))
    Oracle.assertEquivalent(got,
      s"SELECT year, ROUND(SUM(${num("popularity")}), 2) AS sum_popularity, " +
      s"CAST(COUNT(*) AS VARCHAR) AS n, " +
      s"ROUND(MAX(${num("popularity")}), 4) AS max_popularity, " +
      s"ROUND(MIN(${num("popularity")}), 4) AS min_popularity FROM spotify GROUP BY year",
      "spotify" -> in)
  }

  test("q27 matches DuckDB (count(*) by three keys)") {
    val q  = queries.find(_.num == 27).get
    val in = q.step.inputs.head
    val got = q.step.output.select(col("Marital_Status"), col("Gender"),
      col("Education_Level"), col("count").cast("string").as("count"))
    Oracle.assertEquivalent(got,
      s"""SELECT "Marital_Status", "Gender", "Education_Level", CAST(COUNT(*) AS VARCHAR) AS count
          FROM bank GROUP BY "Marital_Status", "Gender", "Education_Level"""",
      "bank" -> in)
  }

  test("q12 is the nested filter: input is already restricted to attrited customers") {
    val q = queries.find(_.num == 12).get
    assert(q.step.inputs.head.where("Attrition_Flag = 'Existing Customer'").count() === 0)
  }

  test("q18 reads products_sales_pack as the view's products_pack") {
    val q = queries.find(_.num == 18).get
    assert(q.step.op.asInstanceOf[GroupByOp].keys === Seq("products_pack"))
  }

  test("join queries produce prefixed schemas") {
    val q1 = queries.find(_.num == 1).get
    assert(q1.step.output.columns.exists(_.startsWith("products_")))
    assert(q1.step.output.columns.exists(_.startsWith("sales_")))
  }

  test("FEDEX end-to-end smoke over one query per kind at test scale") {
    val cfg = FedexConfig(nSets = Seq(5), topKColumns = 2)
    Seq(6, 21, 1).foreach { n =>
      val q   = queries.find(_.num == n).get
      val res = Fedex.explain(q.step, cfg)
      assert(res.columnScores.nonEmpty, s"q$n")
    }
  }
}
