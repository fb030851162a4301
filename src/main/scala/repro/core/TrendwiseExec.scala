package repro.core

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A collected trend: its (g, m) index, constraint values, and the
  * grouping-value → aggregated-measure map (§2.2.1's `(c)(g, m)`).
  */
final case class TrendRow(gm: Int, c: Seq[String], data: Map[String, Double])

/** Merging + partitioning execution strategy (§4.2).
  *
  * Group-by aggregates are merged per [[MergeOptimizer]] to share scans, then
  * the merged output is partitioned *vertically* (per (g, m), by
  * re-aggregation) and *horizontally* (per trend, via
  * `map_from_entries(collect_list(...))`). Trend pairs are then joined and
  * scored independently — small pairwise joins instead of one large
  * trendset-granularity self-join (Figure 5b's observation).
  */
object TrendwiseExec {

  // Cached shared sub-plans ("spools") created by merged execution; benches
  // clear them between timed stages so storage does not accumulate.
  private val spools = scala.collection.mutable.ArrayBuffer.empty[DataFrame]

  def clearSpools(): Unit = spools.synchronized {
    // Blocking: async unpersist would churn the block manager while the next
    // timed measurement runs.
    spools.foreach(_.unpersist(blocking = true))
    spools.clear()
  }

  /** Cache + eagerly materialize a shared sub-plan and register it for
    * [[clearSpools]] — the engine-side analogue of a spool.
    */
  def spool(df: DataFrame): DataFrame = {
    val c = df.cache()
    c.count()
    spools.synchronized { spools += c }
    c
  }

  /** Compute per-(g,m) trend relations for a trendset, optionally sharing
    * scans through merged group-by aggregates. Output columns per relation
    * match [[Relations.trendRel]].
    */
  def trendRels(df: DataFrame, ts: TrendsetSpec, side: Int,
                groups: Seq[Seq[Int]]): Map[Int, DataFrame] = {
    groups.flatMap { gmIdxs =>
      if (gmIdxs.size == 1) {
        val i = gmIdxs.head
        Seq(i -> Relations.trendRel(df, ts, ts.gms(i), side))
      } else mergedGroup(df, ts, side, gmIdxs)
    }.toMap
  }

  /** One merged sub-plan: a single group-by over the union of grouping
    * columns computing decomposable partials (SUM/COUNT/MIN/MAX per measure),
    * then one re-aggregation per member (g, m) (steps 1–4 of §4.2).
    */
  private def mergedGroup(df: DataFrame, ts: TrendsetSpec, side: Int,
                          gmIdxs: Seq[Int]): Seq[(Int, DataFrame)] = {
    val base = Relations.fixedFilter(df, ts)
    val groupings = gmIdxs.map(ts.gms(_).grouping).distinct
    val keyCols = (ts.freeAttrs ++ groupings).map(a => col(a).cast("string").as(a))

    // Partial aggregates, one set per distinct measure column referenced.
    val measures = gmIdxs.map(ts.gms(_).measure).distinct
    val partials = measures.flatMap { m =>
      val c = col(m).cast("double")
      Seq(sum(c).as(s"__sum_$m"), count(c).as(s"__cnt_$m"),
          min(c).as(s"__min_$m"), max(c).as(s"__max_$m"))
    }
    // Cache + materialize: the merged aggregate is the *shared* sub-plan —
    // every member (g, m) re-aggregates from it. Without the eager count(),
    // a single job with several consumer branches would race to compute the
    // same uncached partitions and duplicate the scan (SQL Server shares the
    // sub-plan via spools).
    val merged = base.groupBy(keyCols: _*).agg(partials.head, partials.tail: _*).cache()
    merged.count()
    spools.synchronized { spools += merged }

    gmIdxs.map { i =>
      val gm = ts.gms(i)
      val keys = ts.freeAttrs.map(a => col(a).as(s"${a}_$side")) :+
        col(gm.grouping).as(s"__g$side")
      val v: Column = gm.agg match {
        case AggKind.Avg => sum(col(s"__sum_${gm.measure}")) / sum(col(s"__cnt_${gm.measure}"))
        case AggKind.Sum => sum(col(s"__sum_${gm.measure}"))
        case AggKind.Min => min(col(s"__min_${gm.measure}"))
        case AggKind.Max => max(col(s"__max_${gm.measure}"))
      }
      val reagg = merged.groupBy(keys: _*).agg(v.as(s"__v$side"))
      val withFixed = ts.fixedTerms.foldLeft(reagg) {
        case (d, (a, fv)) => d.withColumn(s"${a}_$side", lit(fv))
      }
      i -> withFixed
    }
  }

  /** Horizontal partitioning: one row per trend, with the trend's tuples as a
    * grouping-value → measure map.
    */
  def trendsDf(rel: DataFrame, ts: TrendsetSpec, gm: Int, side: Int): DataFrame = {
    val cCols = ts.attrs.map(a => col(s"${a}_$side"))
    rel
      .where(col(s"__g$side").isNotNull && col(s"__v$side").isNotNull)
      .groupBy(cCols: _*)
      .agg(map_from_entries(collect_list(struct(col(s"__g$side"), col(s"__v$side")))).as("__data"))
      .withColumn("__gm", lit(gm))
  }

  /** The scorer as a Scala UDF over two trend maps: AGG over DIFF(p) on
    * matching grouping values; None when nothing matches (the pair is then
    * absent, as in the join-based plans).
    */
  def scoreFn(scorer: Scorer): (Map[String, Double], Map[String, Double]) => Option[Double] = {
    (m1, m2) =>
      var n = 0
      var acc = scorer.agg match {
        case AggKind.Sum | AggKind.Avg => 0.0
        case AggKind.Min               => Double.PositiveInfinity
        case AggKind.Max               => Double.NegativeInfinity
      }
      val (small, large, flip) = if (m1.size <= m2.size) (m1, m2, false) else (m2, m1, true)
      small.foreach { case (g, v1) =>
        large.get(g).foreach { v2 =>
          val d = if (flip) scorer.diff(v2, v1) else scorer.diff(v1, v2)
          n += 1
          scorer.agg match {
            case AggKind.Sum | AggKind.Avg => acc += d
            case AggKind.Min               => acc = math.min(acc, d)
            case AggKind.Max               => acc = math.max(acc, d)
          }
        }
      }
      if (n == 0) None
      else Some(if (scorer.agg == AggKind.Avg) acc / n else acc)
  }

  /** Full trendwise scoring in the core output schema.
    *
    * @param merge share aggregates via [[MergeOptimizer]] (requires `stats`);
    *              when false, one group-by per (g, m) (partitioning-only
    *              ablation stage).
    */
  def run(df: DataFrame, spec: CompareSpec, merge: Boolean = true,
          stats: Option[Stats] = None): DataFrame = {
    val (rels1, rels2) = bothSideRels(df, spec, merge, stats)

    val score = udf(scoreFn(spec.scorer))
    val perPair = spec.comparableGmPairs.map { case (i, j) =>
      val left  = trendsDf(rels1(i), spec.t1, i, 1).withColumnRenamed("__data", "__data1")
      val right = trendsDf(rels2(j), spec.t2, j, 2).withColumnRenamed("__data", "__data2")
      val cond  = pairConditionOnTrends(spec, left, right)
      val gm1 = spec.t1.gms(i); val gm2 = spec.t2.gms(j)
      // Trend-level relations are tiny (one row per trend): broadcast the
      // pairwise joins — the partitioned comparison of §4.2.
      left.join(broadcast(right), cond)
        .withColumn("score", score(col("__data1"), col("__data2")))
        .where(col("score").isNotNull)
        .withColumn("grouping", lit(gm1.grouping))
        .withColumn("measure_1", lit(gm1.measureLabel))
        .withColumn("measure_2", lit(gm2.measureLabel))
        .select(CompareOutput.columns(spec).map(col): _*)
    }
    if (perPair.isEmpty) BasicExec.emptyResult(df, spec) else perPair.reduce(_.unionAll(_))
  }

  /** Pair condition over the trend-granularity relations (no grouping column
    * here — trends are whole rows).
    */
  def pairConditionOnTrends(spec: CompareSpec, left: DataFrame, right: DataFrame): Column =
    spec.pairMode match {
      case PairMode.SymmetricConstraint =>
        val l = concat_ws(Relations.KeySep, spec.t1.attrs.map(a => left(s"${a}_1")): _*)
        val r = concat_ws(Relations.KeySep, spec.t2.attrs.map(a => right(s"${a}_2")): _*)
        l < r
      case PairMode.CrossConstraint if spec.excludeIdenticalConstraint =>
        !spec.t1.attrs.zip(spec.t2.attrs)
          .map { case (a1, a2) => left(s"${a1}_1") === right(s"${a2}_2") }
          .reduce(_ && _)
      case _ => lit(true)
    }

  def mergeGroups(df: DataFrame, ts: TrendsetSpec, merge: Boolean,
                  stats: Option[Stats]): Seq[Seq[Int]] =
    if (!merge || ts.gms.size == 1) ts.gms.indices.map(Seq(_))
    else {
      val st = stats.getOrElse(Stats.collect(df, ts.freeAttrs ++ ts.gms.map(_.grouping)))
      MergeOptimizer.optimize(ts, st)
    }

  /** Trend relations for both sides; identical trendset templates (symmetric
    * and cross-measure comparisons) compute side 1 once and rename for
    * side 2 instead of re-aggregating.
    */
  def bothSideRels(df: DataFrame, spec: CompareSpec, merge: Boolean,
                   stats: Option[Stats]): (Map[Int, DataFrame], Map[Int, DataFrame]) = {
    val groups1 = mergeGroups(df, spec.t1, merge, stats)
    val rels1 = trendRels(df, spec.t1, 1, groups1)
    val rels2 =
      if (spec.t1 == spec.t2)
        rels1.map { case (i, rel) =>
          val renames = spec.t1.attrs.map(a => s"${a}_1" -> s"${a}_2") ++
            Seq("__g1" -> "__g2", "__v1" -> "__v2")
          i -> renames.foldLeft(rel) { case (d, (from, to)) => d.withColumnRenamed(from, to) }
        }
      else {
        val groups2 = mergeGroups(df, spec.t2, merge, stats)
        trendRels(df, spec.t2, 2, groups2)
      }
    (rels1, rels2)
  }

  /** Collect both sides' trends to the driver (for the Φp pruning operator).
    * Returns (trends of T1, trends of T2).
    */
  def collectTrends(df: DataFrame, spec: CompareSpec, merge: Boolean = true,
                    stats: Option[Stats] = None): (Seq[TrendRow], Seq[TrendRow]) = {
    val (rels1, rels2) = bothSideRels(df, spec, merge, stats)
    // Union all (g, m) branches and collect once per side — one Spark job per
    // side instead of one per (g, m) (per-job overhead dominates otherwise).
    def collectSide(ts: TrendsetSpec, rels: Map[Int, DataFrame], side: Int,
                    gmIdxs: Seq[Int]): Seq[TrendRow] = {
      val branches = gmIdxs.map(i => trendsDf(rels(i), ts, i, side))
      branches.reduce(_.unionAll(_)).collect().toSeq.map { r =>
        TrendRow(r.getInt(ts.attrs.size + 1),
          ts.attrs.indices.map(k => Option(r.get(k)).map(_.toString).orNull),
          r.getMap[String, Double](ts.attrs.size).toMap)
      }
    }
    val gms1 = spec.comparableGmPairs.map(_._1).distinct
    val gms2 = spec.comparableGmPairs.map(_._2).distinct
    (collectSide(spec.t1, rels1, 1, gms1), collectSide(spec.t2, rels2, 2, gms2))
  }
}
