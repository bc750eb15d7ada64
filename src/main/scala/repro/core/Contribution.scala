package repro.core

import org.apache.spark.sql.functions._
import org.apache.spark.sql.Row

/** Numbers attached to each set-of-rows for caption generation (§3.7).
  *
  * For exceptionality explanations: the set's share of the input and of the
  * output. For diversity explanations: the mean aggregated value of the set's
  * groups versus the mean and standard deviation over all groups.
  */
final case class SetStats(inShare: Option[Double] = None, outShare: Option[Double] = None,
                          setMean: Option[Double] = None, overallMean: Option[Double] = None,
                          overallSd: Option[Double] = None)

/** Contributions of every set in a partition to one output attribute.
  *
  * @param full   I_A(Q) over the full data, as computed by the fast path
  * @param perSet set label → C(R, A, Q) (Def. 3.3)
  * @param stats  set label → caption statistics
  */
final case class ContributionResult(full: Double, perSet: Map[String, Double],
                                    stats: Map[String, SetStats]) {
  /** Standardized contribution C̄ (§3.6) of each set, w.r.t. its partition. */
  lazy val standardized: Map[String, Double] = {
    val vs = perSet.values.toIndexedSeq
    if (vs.size < 2) perSet.map { case (k, _) => k -> 0.0 }
    else {
      val mu = vs.sum / vs.size
      val sd = math.sqrt(vs.map(v => (v - mu) * (v - mu)).sum / (vs.size - 1))
      if (sd == 0.0) perSet.map { case (k, _) => k -> 0.0 }
      else perSet.map { case (k, v) => k -> (v - mu) / sd }
    }
  }
}

/** Contribution of a set-of-rows (paper Def. 3.3):
  * `C(R,A,Q) = I_A(D_in, q, d_out) − I_A(D_in − R, q, d'_out)`.
  *
  * `exact` is the literal interventional semantics (re-run q per exclusion) —
  * the reference used in tests. `all` is the production path: one or two
  * Spark aggregations produce per-(set, value) cells from which the score of
  * *every* exclusion is reconstructed on the driver, because each output row
  * descends from exactly one (partitioned) input row.
  */
object Contribution {
  import Partition.LabelCol

  /** Reference implementation: materialise D_in − R, re-apply q, re-score. */
  def exact(step: Step, attr: String, partition: RowPartition, set: String,
            labeledIdx: Int = 0, maxBins: Int = 1024): Option[Double] = {
    val fullI   = Interestingness.score(step, attr, maxBins)
    val reduced = partition.labeled.where(!(col(LabelCol) <=> lit(set))).drop(LabelCol)
    val newStep = Step(step.inputs.updated(labeledIdx, reduced), step.op)
    val newI    = Interestingness.score(newStep, attr, maxBins)
    for { a <- fullI; b <- newI } yield a - b
  }

  /** Contributions of all sets in `partition` to `attr`, via the aggregation
    * fast path. Returns None when the measure does not apply to `attr`.
    */
  def all(step: Step, attr: String, partition: RowPartition,
          labeledIdx: Int = 0, maxBins: Int = 1024): Option[ContributionResult] =
    step.op match {
      case f: FilterOp  => Some(filterPath(step, f, attr, partition, maxBins))
      case j: JoinOp    => joinPath(step, j, attr, partition, labeledIdx, maxBins)
      case _: UnionOp   => Some(unionPath(step, attr, partition, labeledIdx, maxBins))
      case g: GroupByOp => groupByPath(step, g, attr, partition, maxBins)
    }

  // ---------------------------------------------------------------- helpers

  private def optLabel(r: Row, i: Int): Option[String] =
    if (r.isNullAt(i)) None else Some(r.getString(i))

  /** value→count map after removing the cells of `excluded`. */
  private def minus(cells: Seq[(Option[String], String, Long)],
                    excluded: Option[String]): Seq[(String, Long)] =
    cells.collect { case (l, v, c) if excluded.isEmpty || l != excluded => (v, c) }

  private def shares(cells: Seq[(Option[String], String, Long)]): Map[String, Double] = {
    val total = cells.map(_._3).sum.toDouble
    if (total == 0) Map.empty
    else cells.groupBy(_._1).collect { case (Some(l), cs) => l -> cs.map(_._3).sum / total }
  }

  // ------------------------------------------------------------ filter path

  /** Single aggregation over the labeled input: per (set, value) — input count
    * and surviving-the-predicate count. KS for every exclusion follows on the
    * driver.
    */
  private def filterPath(step: Step, f: FilterOp, attr: String,
                         partition: RowPartition, maxBins: Int): ContributionResult = {
    val (key, numeric) = Ks.keyExpr(step.inputs.head, attr, maxBins)
    val pred = expr(f.predicate)
    val rows = partition.labeled
      .groupBy(col(LabelCol).as("__l"), key(col(attr)).as("__k"))
      .agg(count(lit(1)).as("cin"), sum(when(pred, 1L).otherwise(0L)).as("cout"))
      .collect()
    val inCells  = rows.toSeq.collect { case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(2)) }
    val outCells = rows.toSeq.collect { case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(3)) }
    excResult(Seq(inCells -> true), outCells, numeric, sizeCells = {
      // set sizes irrespective of attr nulls, for input/output shares
      val inS  = rows.toSeq.map(r => (optLabel(r, 0), "", r.getLong(2)))
      val outS = rows.toSeq.map(r => (optLabel(r, 0), "", r.getLong(3)))
      (inS, outS)
    })
  }

  // -------------------------------------------------------------- join path

  /** Two aggregations: the owning input's frequency table (labeled when the
    * owning side is the partitioned one) and the labeled join output's
    * frequency table.
    */
  private def joinPath(step: Step, j: JoinOp, attr: String, partition: RowPartition,
                       labeledIdx: Int, maxBins: Int): Option[ContributionResult] =
    j.inputOf(attr).map { case (ownerIdx, orig) =>
      val owner = step.inputs(ownerIdx)
      val (key, numeric) = Ks.keyExpr(owner, orig, maxBins)
      val inCells =
        if (ownerIdx == labeledIdx)
          partition.labeled
            .groupBy(col(LabelCol).as("__l"), key(col(orig)).as("__k")).count().collect()
            .toSeq.collect { case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(2)) }
        else
          owner.groupBy(key(col(orig)).as("__k")).count().collect()
            .toSeq.collect { case r if !r.isNullAt(0) => (None: Option[String], r.getString(0), r.getLong(1)) }
      val out = step.reapply(step.inputs.updated(labeledIdx, partition.labeled))
      val outRows = out
        .groupBy(col(LabelCol).as("__l"), key(col(attr)).as("__k")).count().collect()
      val outCells = outRows.toSeq.collect {
        case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(2))
      }
      excResult(Seq(inCells -> (ownerIdx == labeledIdx)), outCells, numeric,
        sizeCells = (inCells, outRows.toSeq.map(r => (optLabel(r, 0), "", r.getLong(2)))))
    }

  // ------------------------------------------------------------- union path

  /** Union interestingness is the max KS over the input dataframes (§3.2);
    * removing a set touches the partitioned input and the output.
    */
  private def unionPath(step: Step, attr: String, partition: RowPartition,
                        labeledIdx: Int, maxBins: Int): ContributionResult = {
    val (key, numeric) = Ks.keyExpr(step.inputs(labeledIdx), attr, maxBins)
    val inCellsPerInput = step.inputs.zipWithIndex.map { case (in, i) =>
      if (i == labeledIdx)
        (partition.labeled.groupBy(col(LabelCol).as("__l"), key(col(attr)).as("__k")).count()
          .collect().toSeq.collect { case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(2)) },
          true)
      else
        (in.groupBy(key(col(attr)).as("__k")).count().collect()
          .toSeq.collect { case r if !r.isNullAt(0) => (None: Option[String], r.getString(0), r.getLong(1)) },
          false)
    }
    val out = step.reapply(step.inputs.updated(labeledIdx, partition.labeled))
    val outRows = out.groupBy(col(LabelCol).as("__l"), key(col(attr)).as("__k")).count().collect()
    val outCells = outRows.toSeq.collect {
      case r if !r.isNullAt(1) => (optLabel(r, 0), r.getString(1), r.getLong(2))
    }
    val labeledIn = inCellsPerInput.collectFirst { case (cs, true) => cs }.get
    excResult(inCellsPerInput, outCells, numeric,
      sizeCells = (labeledIn, outRows.toSeq.map(r => (optLabel(r, 0), "", r.getLong(2)))))
  }

  /** Shared exceptionality scoring: I = (max over inputs of) KS(in', out') for
    * the full data and for every exclusion; C = I_full − I_excl.
    */
  private def excResult(inputs: Seq[(Seq[(Option[String], String, Long)], Boolean)],
                        outCells: Seq[(Option[String], String, Long)],
                        numeric: Boolean,
                        sizeCells: (Seq[(Option[String], String, Long)], Seq[(Option[String], String, Long)]))
      : ContributionResult = {
    def iScore(excluded: Option[String]): Double =
      inputs.map { case (cells, labeled) =>
        val in  = minus(cells, if (labeled) excluded else None)
        val out = minus(outCells, excluded)
        Ks.fromCounts(in, out, numeric)
      }.max
    val full = iScore(None)
    val sets = (inputs.collect { case (cs, true) => cs }.flatten.flatMap(_._1) ++
                outCells.flatMap(_._1)).distinct
    val perSet = sets.map(s => s -> (full - iScore(Some(s)))).toMap
    val (inSize, outSize) = sizeCells
    val inShares  = shares(inSize)
    val outShares = shares(outSize)
    val stats = sets.map(s => s -> SetStats(inShare = inShares.get(s), outShare = outShares.get(s))).toMap
    ContributionResult(full, perSet, stats)
  }

  // ---------------------------------------------------------- group-by path

  /** Per-(group, set) partial aggregates reconstruct each group's aggregated
    * value under any exclusion: sum/count/mean exactly; min/max because the
    * sets partition the group's rows.
    */
  private def groupByPath(step: Step, g: GroupByOp, attr: String,
                          partition: RowPartition, maxBins: Int): Option[ContributionResult] = {
    val keyIdx  = g.keys.indexOf(attr)
    val aggSpec = g.aggs.find(_.alias == attr)
    if (keyIdx < 0 && aggSpec.isEmpty) return None
    if (keyIdx >= 0 && !Ks.isNumeric(step.inputs.head, attr)) return None

    val srcCols = g.aggs.map(_.column).filter(_ != "*").distinct
    val aggExprs =
      count(lit(1)).as("__cnt") +:
      srcCols.flatMap(c => Seq(
        sum(col(c).cast("double")).as(s"__sum__$c"),
        count(col(c)).as(s"__cntc__$c"),
        max(col(c).cast("double")).as(s"__max__$c"),
        min(col(c).cast("double")).as(s"__min__$c")))
    val grouped = partition.labeled
      .groupBy((g.keys.map(col) :+ col(LabelCol).as("__l")): _*)
      .agg(aggExprs.head, aggExprs.tail: _*)
      .collect()

    val nk     = g.keys.size
    val schema = g.keys ++ Seq("__l", "__cnt") ++
      srcCols.flatMap(c => Seq(s"__sum__$c", s"__cntc__$c", s"__max__$c", s"__min__$c"))
    val colIdx = schema.zipWithIndex.toMap

    final case class Cell(set: Option[String], cnt: Long,
                          sums: Map[String, Double], cnts: Map[String, Long],
                          maxs: Map[String, Double], mins: Map[String, Double])
    // group identity -> (numeric key value when attr is a key, cells)
    val byGroup: Map[Seq[String], Seq[(Row, Cell)]] = grouped.toSeq.map { r =>
      val gid: Seq[String] = (0 until nk).map(i => if (r.isNullAt(i)) "∅" else r.get(i).toString).toList
      val cell = Cell(
        set = optLabel(r, colIdx("__l")),
        cnt = r.getLong(colIdx("__cnt")),
        sums = srcCols.collect { case c if !r.isNullAt(colIdx(s"__sum__$c")) => c -> r.getDouble(colIdx(s"__sum__$c")) }.toMap,
        cnts = srcCols.map(c => c -> r.getLong(colIdx(s"__cntc__$c"))).toMap,
        maxs = srcCols.collect { case c if !r.isNullAt(colIdx(s"__max__$c")) => c -> r.getDouble(colIdx(s"__max__$c")) }.toMap,
        mins = srcCols.collect { case c if !r.isNullAt(colIdx(s"__min__$c")) => c -> r.getDouble(colIdx(s"__min__$c")) }.toMap)
      gid -> (r, cell)
    }.groupMap(_._1)(_._2)

    /** The group's value for `attr` with `excluded` removed; None if the group
      * vanishes or the aggregate is null (matching Spark semantics).
      */
    def groupValue(cells: Seq[(Row, Cell)], excluded: Option[String]): Option[Double] = {
      val live = cells.filter { case (_, c) => excluded.isEmpty || c.set != excluded }
      if (live.isEmpty || live.map(_._2.cnt).sum == 0L) return None
      if (keyIdx >= 0) {
        val r = live.head._1
        return if (r.isNullAt(keyIdx)) None
               else Some(r.get(keyIdx).toString.toDouble)
      }
      val spec = aggSpec.get
      val c    = spec.column
      spec.func match {
        case "count" if c == "*" => Some(live.map(_._2.cnt).sum.toDouble)
        case "count"             => Some(live.map(_._2.cnts(c)).sum.toDouble)
        case "sum" =>
          val n = live.map(_._2.cnts(c)).sum
          if (n == 0) None else Some(live.flatMap(_._2.sums.get(c)).sum)
        case "mean" | "avg" =>
          val n = live.map(_._2.cnts(c)).sum
          if (n == 0) None else Some(live.flatMap(_._2.sums.get(c)).sum / n)
        case "max" =>
          val vs = live.flatMap(_._2.maxs.get(c)); if (vs.isEmpty) None else Some(vs.max)
        case "min" =>
          val vs = live.flatMap(_._2.mins.get(c)); if (vs.isEmpty) None else Some(vs.min)
      }
    }

    def iScore(excluded: Option[String]): Double =
      Diversity.cv(byGroup.values.flatMap(cs => groupValue(cs, excluded)))

    val full   = iScore(None)
    val sets   = grouped.toSeq.flatMap(r => optLabel(r, colIdx("__l"))).distinct
    val perSet = sets.map(s => s -> (full - iScore(Some(s)))).toMap

    // Caption stats: a group belongs to the set holding a plurality of its rows.
    val fullValues = byGroup.values.flatMap(cs => groupValue(cs, None)).toIndexedSeq
    val mu = if (fullValues.isEmpty) 0.0 else fullValues.sum / fullValues.size
    val sd = if (fullValues.size < 2) 0.0
             else math.sqrt(fullValues.map(v => (v - mu) * (v - mu)).sum / (fullValues.size - 1))
    val setMeans: Map[String, Double] = {
      val assigned = byGroup.values.toSeq.flatMap { cs =>
        val dominant = cs.groupMapReduce(_._2.set)(_._2.cnt)(_ + _).maxBy(_._2)._1
        for { d <- dominant; v <- groupValue(cs, None) } yield d -> v
      }
      assigned.groupMap(_._1)(_._2).map { case (s, vs) => s -> vs.sum / vs.size }
    }
    val stats = sets.map(s => s -> SetStats(
      setMean = setMeans.get(s), overallMean = Some(mu), overallSd = Some(sd))).toMap
    Some(ContributionResult(full, perSet, stats))
  }
}
