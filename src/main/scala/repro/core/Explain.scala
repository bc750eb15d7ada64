package repro.core

import org.apache.spark.sql.DataFrame
import scala.concurrent.{Await, ExecutionContext, Future}
import scala.concurrent.duration.Duration

/** Tunables for the explanation generation of Algorithm 1.
  *
  * @param nSets        numbers of sets-of-rows to try per partition method
  *                     (the paper uses both 5 and 10 and skylines across all)
  * @param topKColumns  greedy step (1): only the most interesting columns get
  *                     contribution analysis (§1, "two-step greedy approach")
  * @param sampleRows   FEDEX-SAMPLING: interestingness over a uniform sample
  * @param maxBins      KS bucketisation bound for high-cardinality numerics
  * @param wI, wC       weights of the optional weighted ranking (§3.7)
  * @param userColumns  §3.8 user-specified columns: restrict the search
  * @param crossColumns pair every partition with every top column (the full
  *                     EC cross product of Algorithm 1) instead of only the
  *                     column-aligned pairs exercised in the paper's examples
  */
final case class FedexConfig(
    nSets: Seq[Int] = Seq(5, 10),
    topKColumns: Int = 5,
    sampleRows: Option[Long] = None,
    maxBins: Int = 1024,
    wI: Double = 1.0,
    wC: Double = 1.0,
    userColumns: Option[Seq[String]] = None,
    enableManyToOne: Boolean = true,
    crossColumns: Boolean = false,
    seed: Long = 42)

/** One explanation candidate (R, A) with its quality scores (§3.4–3.6). */
final case class ExplanationCandidate(
    attr: String, measure: String, method: String,
    partitionAttr: String, labelAttr: String, set: String,
    interestingness: Double, contribution: Double, stdContribution: Double,
    stats: SetStats) {
  /** Stable identity for rank-comparison metrics. */
  def key: String = s"$attr|$method|$labelAttr|$set"
  def weightedScore(wI: Double, wC: Double): Double =
    (wI * interestingness + wC * stdContribution) / (wI + wC)
}

/** A skyline explanation rendered for the user. */
final case class Explanation(candidate: ExplanationCandidate, caption: String, weightedScore: Double)

/** Full result of Algorithm 1 for one exploratory step. */
final case class FedexResult(columnScores: Map[String, Double],
                             candidates: Seq[ExplanationCandidate],
                             skyline: Seq[Explanation]) {
  /** All candidates ranked by the weighted score (used by accuracy metrics). */
  def rankedKeys(wI: Double = 1.0, wC: Double = 1.0): Seq[String] =
    candidates.sortBy(c => (-c.weightedScore(wI, wC), c.key)).map(_.key)
  def top(k: Int): Seq[Explanation] = skyline.take(k)
}

/** FEDEX explanation generation (paper Algorithm 1). */
object Fedex {

  /** Partition targets for explaining output column `attr`: which input index
    * to partition and on which of its attributes. Mirrors the paper's
    * examples: the column itself for filter/join/union (the deviation is in
    * that column), the grouping keys for group-by (the diversity is across
    * groups).
    */
  private def partitionTargets(step: Step, attr: String): Seq[(Int, String)] =
    step.op match {
      case _: FilterOp => if (step.inputs.head.columns.contains(attr)) Seq(0 -> attr) else Seq.empty
      case j: JoinOp   => j.inputOf(attr).toSeq
      case _: UnionOp  => if (step.inputs.head.columns.contains(attr)) Seq(0 -> attr) else Seq.empty
      case g: GroupByOp => g.keys.map(0 -> _)
    }

  /** Attributes excluded from explanation: the filter predicate's own columns
    * (explaining "popularity deviates after filtering on popularity" is
    * vacuous — the paper's Example 3.2 accordingly ranks decade/year/loudness,
    * not popularity, for the popularity filter).
    */
  def excludedAttrs(step: Step): Set[String] = step.op match {
    case FilterOp(pred) => step.inputs.head.columns.filter(pred.contains).toSet
    case _              => Set.empty
  }

  def explain(step: Step, cfg: FedexConfig = FedexConfig()): FedexResult = {
    // Lines 1-2 (+ sampling optimization): per-column interestingness.
    val attrs = cfg.userColumns.getOrElse {
      val excluded = excludedAttrs(step)
      step.outputAttrs.filterNot(excluded)
    }
    val columnScores =
      Interestingness.scores(step, attrs, cfg.maxBins, cfg.sampleRows, cfg.seed)
    val topCols = columnScores.toSeq.sortBy { case (a, s) => (-s, a) }
      .take(cfg.topKColumns).map(_._1)

    // Lines 3-6: row partitions per target attribute (shared across columns).
    val targets: Seq[(Int, String)] =
      if (cfg.crossColumns) topCols.flatMap(partitionTargets(step, _)).distinct
      else topCols.flatMap(partitionTargets(step, _)).distinct
    val partitionsByTarget: Map[(Int, String), Seq[RowPartition]] =
      targets.map { case (idx, pattr) =>
        val parts =
          Partition.candidatesMulti(step.inputs(idx), pattr, cfg.nSets, cfg.enableManyToOne)
        // identical partitions (e.g. n=5 and n=10 over a 3-value column) dedupe
        val distinctParts = parts
          .groupBy(p => (p.method, p.labelAttr, p.sets)).values.map(_.head).toSeq
        (idx, pattr) -> distinctParts
      }.toMap

    val measure = if (step.op.kind == "groupby") "diversity" else "exceptionality"

    // Lines 7-12: contributions for each (partition, column) pair.
    val pairs: Seq[(String, Int, RowPartition)] = topCols.flatMap { a =>
      val ts = if (cfg.crossColumns) targets else partitionTargets(step, a)
      ts.flatMap { case (idx, pattr) =>
        partitionsByTarget.getOrElse((idx, pattr), Seq.empty).map(p => (a, idx, p))
      }
    }.distinct
    implicit val ec: ExecutionContext = Scoring.pool
    val futures = pairs.map { case (a, idx, p) =>
      Future {
        Contribution.all(step, a, p, idx, cfg.maxBins).toSeq.flatMap { res =>
          val std = res.standardized
          res.perSet.toSeq.collect {
            case (set, c) if c > 0 =>
              ExplanationCandidate(
                attr = a, measure = measure, method = p.method,
                partitionAttr = p.attr, labelAttr = p.labelAttr, set = set,
                interestingness = columnScores.getOrElse(a, res.full),
                contribution = c, stdContribution = std(set),
                stats = res.stats.getOrElse(set, SetStats()))
          }
        }
      }
    }
    val partitionOf = pairs.map { case (a, _, p) => (a, p.method, p.labelAttr) -> p }.toMap
    val candidates  = Await.result(Future.sequence(futures), Duration.Inf).flatten

    // Line 13: the interestingness/contribution skyline.
    val sky = Skyline.of(candidates)(_.interestingness, _.stdContribution)
    // Lines 14-15: captions, ranked by the optional weighted score.
    val explanations = sky.map { c =>
      val p = partitionOf((c.attr, c.method, c.labelAttr))
      Explanation(c, Caption.render(c.measure, c.attr, p, c.set,
        c.interestingness, c.stdContribution, c.stats), c.weightedScore(cfg.wI, cfg.wC))
    }.sortBy(e => (-e.weightedScore, e.candidate.key))

    FedexResult(columnScores, candidates, explanations)
  }
}
