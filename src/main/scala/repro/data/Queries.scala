package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{AggSpec, FilterOp, GroupByOp, JoinOp, Step}

/** Row counts for each synthetic dataset instantiation. */
final case class DataScale(spotifyRows: Long, bankRows: Long, productsRows: Long,
                           salesRows: Long, seed: Long = 7)

object DataScale {
  /** Tiny — unit tests. */
  val Test = DataScale(spotifyRows = 4000, bankRows = 1500, productsRows = 400, salesRows = 8000)
  /** Paper-equivalent sizes where feasible. Sales defaults to 200K (the paper
    * used 3,049,913 and sampled up to 10M) so the full bench run stays under
    * an hour on a 16-core box — raise `BENCH_SALES_ROWS` to approach paper
    * scale; `BENCH_SPOTIFY_ROWS` likewise (default is the paper's size).
    */
  def bench: DataScale = DataScale(
    spotifyRows  = sys.env.get("BENCH_SPOTIFY_ROWS").map(_.toLong).getOrElse(174389L),
    bankRows     = 10127L,
    productsRows = 9977L,
    salesRows    = sys.env.get("BENCH_SALES_ROWS").map(_.toLong).getOrElse(200000L))
}

/** All dataframes for one scale, cached on first use. */
final class Frames(spark: SparkSession, scale: DataScale) {
  lazy val spotify: DataFrame  = Datasets.spotify(spark, scale.spotifyRows, scale.seed).cache()
  lazy val bank: DataFrame     = Datasets.bank(spark, scale.bankRows, scale.seed + 1).cache()
  lazy val products: DataFrame = Datasets.products(spark, scale.productsRows, scale.seed + 2).cache()
  lazy val sales: DataFrame    = Datasets.sales(spark, products, scale.salesRows, scale.seed + 3).cache()
  lazy val counties: DataFrame = Datasets.counties(spark, seed = scale.seed + 4)
  lazy val stores: DataFrame   = Datasets.stores(spark, seed = scale.seed + 5)
  lazy val productsSales: DataFrame = Datasets.productsSales(products, sales).cache()
}

/** One evaluation query from Appendix A (Tables 2 and 3). */
final case class BenchQuery(num: Int, dataset: String, kind: String, sqlLike: String, step: Step)

/** The 30 queries of Tables 2 (filter/join, exceptionality) and 3 (group-by,
  * diversity), expressed as exploratory steps over the synthetic frames.
  * Query 18's `products_sales_pack` is read as the view column
  * `products_pack` (the products-side pack in the joined view).
  */
object Queries {

  def mean(c: String): AggSpec  = AggSpec("mean", c, s"mean_$c")
  def maxOf(c: String): AggSpec = AggSpec("max", c, s"max_$c")
  def minOf(c: String): AggSpec = AggSpec("min", c, s"min_$c")
  def cnt(c: String): AggSpec   = AggSpec("count", c, if (c == "*") "count" else s"count_$c")

  def all(f: Frames): Seq[BenchQuery] = filterJoin(f) ++ groupBy(f)

  /** Table 2: join (J) and filter (F) queries 1–15. */
  def filterJoin(f: Frames): Seq[BenchQuery] = Seq(
    BenchQuery(1, "Products", "join", "products ⋈ sales ON item",
      Step(Seq(f.products, f.sales), JoinOp("item", "item", "products_", "sales_"), "q1")),
    BenchQuery(2, "Products", "join", "counties ⋈ sales ON county",
      Step(Seq(f.counties, f.sales), JoinOp("county", "county", "counties_", "sales_"), "q2")),
    BenchQuery(3, "Products", "join", "stores ⋈ sales ON store",
      Step(Seq(f.stores, f.sales), JoinOp("store", "store", "stores_", "sales_"), "q3")),
    BenchQuery(4, "Products", "filter", "products_sales WHERE sales_liter_size <= 500",
      Step(Seq(f.productsSales), FilterOp("sales_liter_size <= 500"), "q4")),
    BenchQuery(5, "Products", "filter", "products_sales WHERE sales_pack == 12",
      Step(Seq(f.productsSales), FilterOp("sales_pack = 12"), "q5")),
    BenchQuery(6, "Spotify", "filter", "spotify WHERE popularity > 65",
      Step(Seq(f.spotify), FilterOp("popularity > 65"), "q6")),
    BenchQuery(7, "Spotify", "filter", "spotify WHERE year > 1990",
      Step(Seq(f.spotify), FilterOp("year > 1990"), "q7")),
    BenchQuery(8, "Spotify", "filter", "spotify WHERE loudness > -12",
      Step(Seq(f.spotify), FilterOp("loudness > -12"), "q8")),
    BenchQuery(9, "Spotify", "filter", "spotify WHERE duration_minutes < 3",
      Step(Seq(f.spotify), FilterOp("duration_minutes < 3"), "q9")),
    BenchQuery(10, "Spotify", "filter", "spotify WHERE tempo > 100",
      Step(Seq(f.spotify), FilterOp("tempo > 100"), "q10")),
    BenchQuery(11, "Bank", "filter", "bank WHERE Attrition_Flag != 'Existing Customer'",
      Step(Seq(f.bank), FilterOp("Attrition_Flag != 'Existing Customer'"), "q11")),
    BenchQuery(12, "Bank", "filter", "attrited WHERE Total_Count_Change_Q4_vs_Q1 > 0.75",
      Step(Seq(f.bank.where("Attrition_Flag != 'Existing Customer'")),
        FilterOp("Total_Count_Change_Q4_vs_Q1 > 0.75"), "q12")),
    BenchQuery(13, "Bank", "filter", "bank WHERE Months_Inactive_Count_Last_Year > 2",
      Step(Seq(f.bank), FilterOp("Months_Inactive_Count_Last_Year > 2"), "q13")),
    BenchQuery(14, "Bank", "filter", "bank WHERE Customer_Age < 30",
      Step(Seq(f.bank), FilterOp("Customer_Age < 30"), "q14")),
    BenchQuery(15, "Bank", "filter", "bank WHERE Income_Category == 'Less than $40K'",
      Step(Seq(f.bank), FilterOp("Income_Category = 'Less than $40K'"), "q15")))

  /** Table 3: group-by queries 16–30. */
  def groupBy(f: Frames): Seq[BenchQuery] = Seq(
    BenchQuery(16, "Products", "groupby", "count(item) GROUP BY sales_vendor",
      Step(Seq(f.productsSales), GroupByOp(Seq("sales_vendor"), Seq(cnt("sales_item"))), "q16")),
    BenchQuery(17, "Products", "groupby", "count(item) GROUP BY sales_county, sales_category_name",
      Step(Seq(f.productsSales), GroupByOp(Seq("sales_county", "sales_category_name"), Seq(cnt("sales_item"))), "q17")),
    BenchQuery(18, "Products", "groupby", "count(item) GROUP BY products_pack",
      Step(Seq(f.productsSales), GroupByOp(Seq("products_pack"), Seq(cnt("sales_item"))), "q18")),
    BenchQuery(19, "Products", "groupby", "mean(sales_total), mean(sales_pack) GROUP BY sales_bottle_quantity",
      Step(Seq(f.productsSales), GroupByOp(Seq("sales_bottle_quantity"),
        Seq(mean("sales_total"), mean("sales_pack"))), "q19")),
    BenchQuery(20, "Products", "groupby", "mean(products_bottle_size) GROUP BY products_pack, products_inner_pack",
      Step(Seq(f.productsSales), GroupByOp(Seq("products_pack", "products_inner_pack"),
        Seq(mean("products_bottle_size"))), "q20")),
    BenchQuery(21, "Spotify", "groupby", "mean/max/min(popularity) GROUP BY year",
      Step(Seq(f.spotify), GroupByOp(Seq("year"),
        Seq(mean("popularity"), maxOf("popularity"), minOf("popularity"))), "q21")),
    BenchQuery(22, "Spotify", "groupby", "danceability/instrumentalness/liveness aggs GROUP BY year",
      Step(Seq(f.spotify), GroupByOp(Seq("year"),
        Seq(mean("danceability"), maxOf("danceability"), mean("instrumentalness"),
            maxOf("instrumentalness"), mean("liveness"))), "q22")),
    BenchQuery(23, "Spotify", "groupby", "mean(danceability), mean(popularity) GROUP BY key",
      Step(Seq(f.spotify), GroupByOp(Seq("key"), Seq(mean("danceability"), mean("popularity"))), "q23")),
    BenchQuery(24, "Spotify", "groupby", "max/mean(duration_minutes) GROUP BY decade",
      Step(Seq(f.spotify), GroupByOp(Seq("decade"),
        Seq(maxOf("duration_minutes"), mean("duration_minutes"))), "q24")),
    BenchQuery(25, "Spotify", "groupby", "mean(loudness/liveness/tempo) GROUP BY mode, key",
      Step(Seq(f.spotify), GroupByOp(Seq("mode", "key"),
        Seq(mean("loudness"), mean("liveness"), mean("tempo"))), "q25")),
    BenchQuery(26, "Bank", "groupby", "mean(Credit_Used), mean(Total_Transitions_Amount) GROUP BY Marital_Status, Income_Category",
      Step(Seq(f.bank), GroupByOp(Seq("Marital_Status", "Income_Category"),
        Seq(mean("Credit_Used"), mean("Total_Transitions_Amount"))), "q26")),
    BenchQuery(27, "Bank", "groupby", "count GROUP BY Marital_Status, Gender, Education_Level",
      Step(Seq(f.bank), GroupByOp(Seq("Marital_Status", "Gender", "Education_Level"), Seq(cnt("*"))), "q27")),
    BenchQuery(28, "Bank", "groupby", "mean(Credit_Used), mean(Total_Transitions_Amount) GROUP BY Marital_Status",
      Step(Seq(f.bank), GroupByOp(Seq("Marital_Status"),
        Seq(mean("Credit_Used"), mean("Total_Transitions_Amount"))), "q28")),
    BenchQuery(29, "Bank", "groupby", "mean(Customer_Age) GROUP BY Gender, Income_Category",
      Step(Seq(f.bank), GroupByOp(Seq("Gender", "Income_Category"), Seq(mean("Customer_Age"))), "q29")),
    BenchQuery(30, "Bank", "groupby", "count GROUP BY Registered_Products_Count, Attrition_Flag",
      Step(Seq(f.bank), GroupByOp(Seq("Registered_Products_Count", "Attrition_Flag"), Seq(cnt("*"))), "q30")))
}
