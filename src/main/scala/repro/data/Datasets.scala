package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-ins for the paper's three real-world datasets (see
  * DESIGN.md §3 for the substitution rationale). All generators are
  * deterministic in (rows, seed). Schemas carry every column referenced by
  * the 30 evaluation queries (Appendix A), plus filler columns to match the
  * paper's column counts; distributions are skewed and patterns are *planted*
  * to reproduce the paper's qualitative findings:
  *
  * - Spotify: 2010s/2020s songs are far more popular (→ the `popularity > 65`
  *   filter deviates most on decade/year); 1990s songs are markedly less loud
  *   (→ high diversity of mean loudness by year, explained by decade, which
  *   is a many-to-one coarsening of year); 2020s songs are more danceable;
  *   acoustic songs are less popular.
  * - Bank: attrited customers transact less, are inactive longer, and get
  *   contacted more.
  * - Products & Sales: zipf-skewed items/vendors/counties; sales denormalise
  *   product attributes so the products⋈sales join shifts vendor/category
  *   distributions; small bottles cluster in specific categories.
  */
object Datasets {

  /** Zipf-ish skewed pick of an index in [0, n): pow sharpens toward 0. */
  private def skewIdx(seed: Long, n: Int, sharp: Double): Column =
    (pow(rand(seed), sharp) * n).cast(IntegerType)

  private def pick(seed: Long, sharp: Double, values: String*): Column =
    element_at(array(values.map(lit): _*), skewIdx(seed, values.size, sharp) + 1)

  private def clip(c: Column, lo: Double, hi: Double): Column =
    least(greatest(c, lit(lo)), lit(hi))

  /** Gaussian-ish noise in roughly [-1, 1] (sum of uniforms, centered). */
  private def noise(seed: Long): Column =
    (rand(seed) + rand(seed + 1000) + rand(seed + 2000)) / 1.5 - 1.0

  // -------------------------------------------------------------- Spotify

  /** Song dataset: 20 columns, paper size 174,389 rows. */
  def spotify(spark: SparkSession, rows: Long = 174389, seed: Long = 11): DataFrame = {
    val base = spark.range(rows).select(
      col("id"),
      // older years more frequent: the 2010s are a modest share of the data
      (lit(1950) + floor(pow(rand(seed), 1.4) * lit(73.99))).cast(IntegerType).as("year"))
      .withColumn("decade", concat((floor(col("year") / 10) * 10).cast(IntegerType), lit("s")))
    base.select(
      concat(lit("song_"), col("id")).as("name"),
      concat(lit("artist_"), skewIdx(seed + 1, 2000, 2.0)).as("main_artist"),
      pick(seed + 2, 1.7, "pop", "rock", "hip-hop", "jazz", "electronic", "country", "classical", "metal").as("genre"),
      col("year"),
      col("decade"),
      round(clip(lit(2.0) + rand(seed + 3) * 4 + noise(seed + 4), 0.8, 10.0), 3).as("duration_minutes"),
      round(clip(lit(115.0) + noise(seed + 5) * 35, 50.0, 220.0), 1).as("tempo"),
      (rand(seed + 6) * 12).cast(IntegerType).as("key"),
      (rand(seed + 7) * 2).cast(IntegerType).as("mode"),
      (rand(seed + 8) < 0.12).cast(IntegerType).as("explicit"),
      round(clip(lit(0.85) - (col("year") - 1950) * 0.009 + noise(seed + 9) * 0.2, 0.0, 1.0), 4).as("acousticness"),
      // planted: 2020s songs are clearly more danceable
      round(clip(lit(0.45) + (col("year") - 1950) * 0.0015 +
        when(col("decade") === "2020s", 0.18).otherwise(0.0) + noise(seed + 10) * 0.1, 0.0, 1.0), 4).as("danceability"),
      round(clip(lit(0.4) + (col("year") - 1950) * 0.003 + noise(seed + 11) * 0.15, 0.0, 1.0), 4).as("energy"),
      round(clip(pow(rand(seed + 12), 3.0), 0.0, 1.0), 4).as("instrumentalness"),
      round(clip(lit(0.2) + pow(rand(seed + 13), 2.0) * 0.6, 0.0, 1.0), 4).as("liveness"),
      // planted: loudness rises with year EXCEPT a 1990s notch 3dB quieter
      round(clip(lit(-16.0) + (col("year") - 1950) * 0.09 +
        when(col("decade") === "1990s", -3.0).otherwise(0.0) + noise(seed + 14) * 2.0, -30.0, 0.0), 3).as("loudness"),
      round(clip(pow(rand(seed + 15), 2.5) * 0.5, 0.0, 1.0), 4).as("speechiness"),
      round(clip(lit(0.5) + noise(seed + 16) * 0.25, 0.0, 1.0), 4).as("valence"),
      round(clip(lit(20.0) + rand(seed + 17) * 70, 0.0, 100.0), 1).as("artist_popularity"),
      // planted: popularity jumps for songs from 2010 onward, dips for acoustic songs
      round(clip(lit(22.0) + (col("year") - 1950) * 0.25 +
        when(col("year") >= 2010, 28.0).otherwise(0.0) +
        when(col("acousticness") > 0.5, -9.0).otherwise(0.0) +
        noise(seed + 18) * 14, 0.0, 100.0), 1).as("popularity"))
  }

  // ----------------------------------------------------------------- Bank

  private val IncomeCats = Seq("Less than $40K", "$40K - $60K", "$60K - $80K", "$80K - $120K", "$120K +", "Unknown")

  /** Credit Card Customers dataset: 21 columns, paper size 10,127 rows. */
  def bank(spark: SparkSession, rows: Long = 10127, seed: Long = 23): DataFrame = {
    val base = spark.range(rows).select(
      col("id"),
      (rand(seed) < 0.16).as("churn"))
    val attrited = col("churn")
    base.select(
      (col("id") + 708000000L).as("CLIENTNUM"),
      when(attrited, "Attrited Customer").otherwise("Existing Customer").as("Attrition_Flag"),
      (lit(26) + rand(seed + 1) * 47).cast(IntegerType).as("Customer_Age"),
      when(rand(seed + 2) < 0.53, "F").otherwise("M").as("Gender"),
      (rand(seed + 3) * 6).cast(IntegerType).as("Dependent_count"),
      pick(seed + 4, 1.0, "Graduate", "High School", "Uneducated", "College", "Post-Graduate", "Doctorate", "Unknown").as("Education_Level"),
      pick(seed + 5, 1.0, "Married", "Single", "Divorced", "Unknown").as("Marital_Status"),
      // planted: attrited customers skew to the lower income brackets
      element_at(array(IncomeCats.map(lit): _*),
        clip((pow(rand(seed + 6), when(attrited, 1.9).otherwise(1.1)) * 6).cast(IntegerType), 0, 5).cast(IntegerType) + 1
      ).as("Income_Category"),
      pick(seed + 7, 2.5, "Blue", "Silver", "Gold", "Platinum").as("Card_Category"),
      (lit(13) + rand(seed + 8) * 43).cast(IntegerType).as("Months_on_book"),
      // planted: attrited customers hold fewer products
      clip((lit(1) + rand(seed + 9) * 5 - when(attrited, 1.4).otherwise(0.0)).cast(IntegerType), 1, 6)
        .cast(IntegerType).as("Registered_Products_Count"),
      // planted: attrited customers were inactive longer
      clip(((rand(seed + 10) * 4) + when(attrited, 2.2).otherwise(0.0)).cast(IntegerType), 0, 6)
        .cast(IntegerType).as("Months_Inactive_Count_Last_Year"),
      // planted: attrited customers contacted support more
      clip(((rand(seed + 11) * 3.5) + when(attrited, 1.8).otherwise(0.0)).cast(IntegerType), 0, 6)
        .cast(IntegerType).as("Contacts_Count"),
      round(lit(1400.0) + pow(rand(seed + 12), 2.0) * 33100, 2).as("Credit_Limit"),
      // planted: attrited customers utilise less credit
      round(clip(pow(rand(seed + 13), when(attrited, 2.6).otherwise(1.2)), 0.0, 1.0), 3).as("Avg_Utilization_Ratio"),
      round((lit(1400.0) + pow(rand(seed + 12), 2.0) * 33100) *
        clip(pow(rand(seed + 13), when(attrited, 2.6).otherwise(1.2)), 0.0, 1.0), 2).as("Credit_Used"),
      // planted: attrited customers transact far less
      round((lit(500.0) + rand(seed + 14) * 17500) * when(attrited, 0.45).otherwise(1.0), 2).as("Total_Transitions_Amount"),
      ((lit(10) + rand(seed + 15) * 120) * when(attrited, 0.5).otherwise(1.0)).cast(IntegerType).as("Total_Trans_Ct"),
      round(clip(lit(0.2) + rand(seed + 16) * 1.2 - when(attrited, 0.35).otherwise(0.0), 0.0, 1.5), 3).as("Total_Count_Change_Q4_vs_Q1"),
      round(clip(lit(0.3) + rand(seed + 17) * 1.0 - when(attrited, 0.25).otherwise(0.0), 0.0, 1.5), 3).as("Total_Amount_Change_Q4_vs_Q1"),
      round(lit(1400.0) + pow(rand(seed + 12), 2.0) * 33100 -
        (lit(1400.0) + pow(rand(seed + 12), 2.0) * 33100) *
        clip(pow(rand(seed + 13), when(attrited, 2.6).otherwise(1.2)), 0.0, 1.0), 2).as("Avg_Open_To_Buy"))
  }

  // ---------------------------------------------------- Products & Sales

  private val Categories = Seq("VODKA", "WHISKY", "RUM", "TEQUILA", "GIN", "BRANDY",
    "LIQUEUR", "SCHNAPPS", "BOURBON", "SCOTCH", "MEZCAL", "COCKTAILS")
  private val BottleSizes = Seq(50, 100, 200, 375, 500, 750, 1000, 1500, 1750)

  /** Products table: 16 columns, paper size 9,977 rows. Small bottle sizes
    * (≤500ml) concentrate in LIQUEUR/SCHNAPPS/COCKTAILS; vendors are skewed.
    */
  def products(spark: SparkSession, rows: Long = 9977, seed: Long = 31): DataFrame = {
    val base = spark.range(1, rows + 1).select(
      col("id").as("item"),
      pick(seed, 1.8, Categories: _*).as("category_name"),
      skewIdx(seed + 1, 200, 2.2).as("vendor"))
    base.select(
      col("item"),
      concat(lit("product_"), col("item")).as("name"),
      col("category_name"),
      col("vendor"),
      concat(lit("vendor_"), col("vendor")).as("vendor_name"),
      // planted: pack=12 is common but vendor-skewed
      element_at(array(lit(1), lit(2), lit(4), lit(6), lit(12), lit(12), lit(24), lit(48)),
        when(col("vendor") < 20, (rand(seed + 2) * 4 + 4).cast(IntegerType))
          .otherwise((rand(seed + 2) * 8).cast(IntegerType)) + 1).as("pack"),
      element_at(array(lit(1), lit(2), lit(6), lit(12)), (rand(seed + 3) * 4).cast(IntegerType) + 1).as("inner_pack"),
      (lit(2) + rand(seed + 4) * 16).cast(IntegerType).as("age"),
      (lit(40) + rand(seed + 5) * 120).cast(IntegerType).as("proof"),
      concat(lit("20"), (rand(seed + 6) * 22 + 1).cast(IntegerType)).as("list_year"),
      (col("item") * 37 % 1000000).as("upc"),
      (col("item") * 91 % 1000000).as("scc"),
      // planted: small bottles live in sweet/cocktail categories
      element_at(array(BottleSizes.map(lit(_)): _*),
        when(col("category_name").isin("LIQUEUR", "SCHNAPPS", "COCKTAILS"),
          (rand(seed + 7) * 5).cast(IntegerType))
          .otherwise((rand(seed + 7) * 5 + 4).cast(IntegerType)) + 1).as("bottle_size"),
      round(lit(3.0) + pow(rand(seed + 8), 2.0) * 80, 2).as("bottle_price"),
      round((lit(3.0) + pow(rand(seed + 8), 2.0) * 80) * 0.66, 2).as("case_cost"))
      .withColumn("liter_size", col("bottle_size"))
  }

  /** Counties lookup table (for query 2). */
  def counties(spark: SparkSession, n: Int = 100, seed: Long = 41): DataFrame =
    spark.range(1, n + 1).select(
      concat(lit("county_"), col("id")).as("county"),
      (lit(5000) + pow(rand(seed), 2.0) * 995000).cast(LongType).as("population"),
      concat(lit("seat_"), col("id")).as("county_seat"))

  /** Stores lookup table (for query 3). */
  def stores(spark: SparkSession, n: Int = 1000, seed: Long = 43): DataFrame =
    spark.range(1, n + 1).select(
      col("id").as("store"),
      concat(lit("store_"), col("id")).as("store_name"),
      concat(lit("city_"), skewIdx(seed, 120, 1.8)).as("city"),
      concat(lit("county_"), skewIdx(seed + 1, 100, 1.6) + 1).as("county_ref"))

  /** Sales table: 17 columns, paper size 3,049,913 rows (configurable — see
    * DESIGN.md scale notes). Items sell with zipf skew, so the products⋈sales
    * join re-weights the vendor/category distributions; denormalised product
    * attributes (vendor, category, pack, sizes, price) are copied via a join
    * against `products`, as in the original Iowa liquor sales data.
    */
  def sales(spark: SparkSession, products: DataFrame, rows: Long = 500000, seed: Long = 53): DataFrame = {
    val nP = products.count()
    val base = spark.range(rows).select(
      col("id").as("invoice"),
      (pow(rand(seed), 2.5) * nP).cast(LongType).as("__r"),
      (skewIdx(seed + 1, 1000, 2.0) + 1).cast(LongType).as("store"),
      concat(lit("county_"), skewIdx(seed + 2, 100, 1.9) + 1).as("county"),
      concat(lit("2021-"), lpad(((rand(seed + 3) * 12).cast(IntegerType) + 1).cast("string"), 2, "0"),
        lit("-"), lpad(((rand(seed + 4) * 28).cast(IntegerType) + 1).cast("string"), 2, "0")).as("date"),
      (lit(1) + pow(rand(seed + 5), 2.0) * 47).cast(IntegerType).as("quantity"),
      (lit(1) + rand(seed + 6) * 11).cast(IntegerType).as("bottle_quantity"))
      // zipf rank → item id; ranks are spread over the id space deterministically
      .withColumn("item", pmod(col("__r") * 104729L, lit(nP)) + 1)
      .drop("__r")
    val p = products.select(
      col("item"),
      col("vendor"), col("vendor_name"), col("category_name"),
      col("pack"), col("bottle_size"), col("liter_size"), col("bottle_price"))
    base.join(p, "item").select(
      col("invoice"), col("item"), col("store"), col("county"), col("date"),
      col("quantity"), col("bottle_quantity"),
      col("vendor"), col("vendor_name"), col("category_name"),
      col("pack"), col("bottle_size"), col("liter_size"), col("bottle_price"),
      round(col("bottle_price") * col("quantity"), 2).as("total"),
      round(col("liter_size") * col("quantity") / 1000.0, 3).as("volume_sold_liters"),
      round(col("liter_size") * col("quantity") / 3785.0, 3).as("volume_sold_gallons"))
  }

  /** The products⋈sales view used by queries 4, 5 and 16–20: columns prefixed
    * `products_` / `sales_` as in the paper's Appendix A names.
    */
  def productsSales(productsDf: DataFrame, salesDf: DataFrame): DataFrame = {
    import repro.core.{JoinOp, Step}
    Step(Seq(productsDf, salesDf), JoinOp("item", "item", "products_", "sales_")).output
  }
}
