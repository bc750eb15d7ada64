package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Uniform row sampling used by FEDEX-SAMPLING (§3.7 "Sampling optimization"):
  * interestingness is computed over a uniform sample of the input rows; all
  * other parts of the algorithm (partitioning, contribution) see full data.
  */
object Sampling {

  /** Uniformly sample `df` down to at most `rows` rows (deterministic in
    * `seed`). Returns `df` unchanged when it is already small enough.
    */
  def uniform(df: DataFrame, rows: Long, seed: Long = 42): DataFrame = {
    val n = df.count()
    if (n <= rows) df
    else {
      // Slight over-sampling + limit gives an exact cap without a second pass.
      val fraction = math.min(1.0, rows.toDouble / n * 1.1)
      df.sample(withReplacement = false, fraction, seed).limit(rows.toInt)
    }
  }
}

/** Per-column interestingness scores I_A(Q) (paper §3.2): KS exceptionality
  * for filter/join/union, CV diversity for group-by.
  */
object Interestingness {

  /** Score a single output attribute. Returns None when the measure does not
    * apply (diversity over a non-numeric column, join attribute of unknown
    * provenance, the synthetic partition label).
    */
  def score(step: Step, attr: String, maxBins: Int = 1024): Option[Double] =
    scoreAgainst(step, step.inputs, step.output, attr, maxBins)

  /** As `score`, but over explicitly supplied (possibly sampled) input and
    * output dataframes. `statsInputs` (the full inputs) decide the KS key
    * space so sampled and exact runs bucketise identically.
    */
  def scoreAgainst(step: Step, ins: Seq[DataFrame], out: DataFrame, attr: String,
                   maxBins: Int): Option[Double] = {
    if (attr == Partition.LabelCol) return None
    step.op match {
      case _: FilterOp =>
        Some(Ks.statistic(ins.head, out, attr, maxBins))
      case j: JoinOp =>
        j.inputOf(attr).map { case (idx, orig) =>
          val in = ins(idx).withColumnRenamed(orig, attr)
          Ks.statistic(in, out, attr, maxBins)
        }
      case _: UnionOp =>
        Some(ins.map(in => Ks.statistic(in, out, attr, maxBins)).max)
      case _: GroupByOp =>
        if (Ks.isNumeric(out, attr)) Some(Diversity.cv(out, attr)) else None
    }
  }

  /** Scores for every output attribute of the step. With `sampleRows` set,
    * implements FEDEX-SAMPLING: inputs are uniformly sampled, the operation is
    * re-applied to the sample, and scores are computed on the sampled pair.
    * Columns are scored concurrently (Spark schedules the small jobs in
    * parallel on the local cluster).
    */
  def scores(step: Step, attrs: Seq[String], maxBins: Int = 1024,
             sampleRows: Option[Long] = None, seed: Long = 42): Map[String, Double] = {
    val (ins, out) = sampleRows match {
      case None => (step.inputs, step.output)
      case Some(k) =>
        val sampled = step.inputs.map(in => Sampling.uniform(in, k, seed).cache())
        val o       = step.reapply(sampled).cache()
        (sampled, o)
    }
    import scala.concurrent.{Await, ExecutionContext, Future}
    import scala.concurrent.duration.Duration
    implicit val ec: ExecutionContext = Scoring.pool
    val futures = attrs.map(a => Future(a -> scoreAgainst(step, ins, out, a, maxBins)))
    val res = Await.result(Future.sequence(futures), Duration.Inf)
      .collect { case (a, Some(s)) => a -> s }.toMap
    if (sampleRows.isDefined) { ins.foreach(_.unpersist()); out.unpersist() }
    res
  }
}

/** Shared bounded thread pool for concurrent per-column scoring jobs. */
private[core] object Scoring {
  import java.util.concurrent.Executors
  import scala.concurrent.ExecutionContext
  lazy val pool: ExecutionContext =
    ExecutionContext.fromExecutorService(Executors.newFixedThreadPool(8))
}
