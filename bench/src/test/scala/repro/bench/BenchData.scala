package repro.bench

import org.apache.spark.sql.SparkSession
import repro.SparkSpec
import repro.core.FedexConfig
import repro.data.{BenchQuery, DataScale, Frames, Queries}

/** Shared state for all bench suites: one SparkSession, one set of cached
  * frames at bench scale, and markdown-ish table printing so the tee'd
  * bench_output.txt is directly readable next to EXPERIMENTS.md.
  */
object BenchData {
  lazy val spark: SparkSession = SparkSpec.shared
  lazy val scale: DataScale    = DataScale.bench
  lazy val frames: Frames      = new Frames(spark, scale)
  lazy val queries: Seq[BenchQuery] = Queries.all(frames)

  /** Default FEDEX configuration for benches (paper: n ∈ {5, 10}). */
  val cfg: FedexConfig = FedexConfig(nSets = Seq(5, 10), topKColumns = 5)

  def q(num: Int): BenchQuery = queries.find(_.num == num).get

  def table(title: String, headers: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val all    = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) = r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    println()
    println(s"=== $title ===")
    println(fmt(headers))
    println(widths.map("-" * _).mkString("|-", "-|-", "-|"))
    rows.foreach(r => println(fmt(r)))
    println()
  }

  def f(x: Double): String  = f"$x%.3f"
  def f2(x: Double): String = f"$x%.2f"
}
