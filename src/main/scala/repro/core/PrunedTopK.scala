package repro.core

import scala.collection.mutable
import TrendModel._

/** The DIFF-specialized top-k operator Φp (§5, Algorithm 2):
  * summarize → bound → prune, then priority-queue early termination that
  * refines one segment at a time, switching to whichever pair currently has
  * the best optimistic bound.
  *
  * Supports both search directions: `ascending = true` finds the k most
  * similar pairs (smallest scores; prune when a pair's lower bound exceeds
  * the k-th smallest upper bound), `false` the k most different.
  *
  * Bounds-based pruning applies to SUM/AVG scorers (the aggregated distance
  * functions of §2.2.3); MIN/MAX scorers are computed exactly.
  */
object PrunedTopK {

  /** Knobs exposed for the §8.3 sweeps and the §8.1 ablation.
    *
    * @param numSegments          override Sturges' choice (Figure 11 sweep)
    * @param usePruning           disable summarize→bound→prune (ablation)
    * @param useEarlyTermination  disable the PQ segment-at-a-time refinement
    *                             (ablation: survivors are scored exactly)
    */
  final case class Config(
      numSegments: Option[Int] = None,
      usePruning: Boolean = true,
      useEarlyTermination: Boolean = true)

  /** Observability counters — drive the ablation/bench tables and the
    * memory-overhead estimate (§8.6; each summary aggregate is 4 numbers).
    */
  final case class PruneStats(
      pairsTotal: Long,
      pairsPrunedInitial: Long,
      pairsPrunedSearch: Long,
      segmentsProcessed: Long,
      tuplesCompared: Long,
      trendCount: Long,
      summaryDoubles: Long) {
    def pairsPruned: Long = pairsPrunedInitial + pairsPrunedSearch
    def summaryBytes: Long = summaryDoubles * 8
  }

  final case class Result(pairs: Seq[ScoredPair], stats: PruneStats)

  /** Run top-k selection over the collected trends of both sides. */
  def run(spec: CompareSpec, trends1: Seq[TrendRow], trends2: Seq[TrendRow],
          topK: TopK, cfg: Config = Config()): Result = {

    // --- Summarize: shared dictionary + segmentation per grouping column ---
    val gmGrouping1 = spec.t1.gms.map(_.grouping)
    val gmGrouping2 = spec.t2.gms.map(_.grouping)
    val dictKeys = mutable.Map.empty[String, mutable.Set[String]]
    trends1.foreach(t => dictKeys.getOrElseUpdate(gmGrouping1(t.gm), mutable.Set.empty) ++= t.data.keys)
    trends2.foreach(t => dictKeys.getOrElseUpdate(gmGrouping2(t.gm), mutable.Set.empty) ++= t.data.keys)
    val dicts = dictKeys.map { case (g, ks) => g -> GroupingDict.build(ks) }.toMap
    val segmentations = dicts.map { case (g, d) =>
      g -> new Segmentation(d.size, cfg.numSegments.getOrElse(sturges(d.size)))
    }

    def summarize(ts: TrendsetSpec, rows: Seq[TrendRow]): Seq[SegTrend] =
      rows.map { r =>
        val g = ts.gms(r.gm).grouping
        buildTrend(r, dicts(g), segmentations(g))
      }
    val side1 = summarize(spec.t1, trends1)
    val side2 = summarize(spec.t2, trends2)
    val trendCount = (side1.size + side2.size).toLong
    val summaryDoubles = (side1 ++ side2).map(_.segs.length.toLong * 4).sum

    // --- Enumerate candidate pairs (pair-mode conditions on c values) ---
    val by1 = side1.groupBy(_.gm)
    val by2 = side2.groupBy(_.gm)
    val candidates = mutable.ArrayBuffer.empty[(SegTrend, SegTrend)]
    spec.comparableGmPairs.foreach { case (i, j) =>
      for (t1 <- by1.getOrElse(i, Nil); t2 <- by2.getOrElse(j, Nil)) {
        val keep = spec.pairMode match {
          case PairMode.SymmetricConstraint =>
            t1.c.mkString(Relations.KeySep) < t2.c.mkString(Relations.KeySep)
          case PairMode.CrossConstraint if spec.excludeIdenticalConstraint =>
            t1.c != t2.c
          case _ => true
        }
        if (keep) candidates += ((t1, t2))
      }
    }

    var tuplesCompared = 0L
    var segmentsProcessed = 0L

    def mkPair(t1: SegTrend, t2: SegTrend, score: Double): ScoredPair =
      ScoredPair(t1.c, t2.c, t1.gm, t2.gm, score)

    def sortSelect(all: Seq[ScoredPair]): Seq[ScoredPair] = {
      val sorted = all.sortBy(p =>
        (if (topK.ascending) p.score else -p.score,
         p.c1.mkString(Relations.KeySep), p.c2.mkString(Relations.KeySep), p.gm1, p.gm2))
      sorted.take(topK.k)
    }

    val boundsSupported =
      spec.scorer.agg == AggKind.Sum || spec.scorer.agg == AggKind.Avg

    if (!cfg.usePruning || !boundsSupported) {
      // Exhaustive trendwise scoring (ablation stage / unsupported scorer).
      val scored = candidates.flatMap { case (t1, t2) =>
        val (s, touched) = exactScore(t1, t2, spec.scorer)
        tuplesCompared += touched
        s.map(mkPair(t1, t2, _))
      }
      return Result(sortSelect(scored.toSeq),
        PruneStats(candidates.size, 0, 0, 0, tuplesCompared, trendCount, summaryDoubles))
    }

    // --- Bound: per-pair segment bounds; rank space maximizes "bestness" ---
    // rank = score (descending search) or -score (ascending search);
    // optimistic = best achievable rank, guarantee = certain rank.
    val p = spec.scorer.p
    final class PairState(val t1: SegTrend, val t2: SegTrend) {
      val seg = t1.seg
      val bounds: Array[SegBound] = Array.tabulate(seg.count)(s => segBound(t1, t2, s, p))
      val totalMatched: Int = bounds.map(_.matched).sum
      var nextSeg = 0
      var exactSum = 0.0
      var remLower: Double = bounds.map(_.lower).sum
      var remUpper: Double = bounds.map(_.upper).sum
      def done: Boolean = nextSeg >= seg.count
      private def toScore(sum: Double): Double =
        if (spec.scorer.agg == AggKind.Avg) sum / totalMatched else sum
      def lowerScore: Double = toScore(exactSum + remLower)
      def upperScore: Double = toScore(exactSum + remUpper)
      def optimistic: Double = if (topK.ascending) -lowerScore else upperScore
      def guarantee: Double  = if (topK.ascending) -upperScore else lowerScore
      def exactScoreNow: Double = { assert(done); toScore(exactSum) }
      def processOneSegment(): Unit = {
        // Skip zero-match segments outright — they contribute nothing.
        while (!done && bounds(nextSeg).matched == 0) nextSeg += 1
        if (done) return
        val (sum, _, touched) = exactSegment(t1, t2, nextSeg, p)
        tuplesCompared += touched
        segmentsProcessed += 1
        exactSum += sum
        remLower -= bounds(nextSeg).lower
        remUpper -= bounds(nextSeg).upper
        nextSeg += 1
      }
    }

    val pairs = candidates.map { case (t1, t2) => new PairState(t1, t2) }
      .filter(_.totalMatched > 0)
    val pairsTotal = pairs.size.toLong

    // Pruning threshold T: the k-th best guarantee over distinct pairs
    // (recomputed lazily as guarantees improve — stale thresholds are only
    // weaker, never unsound).
    def kthBestGuarantee(): Double =
      if (pairs.size < topK.k) Double.NegativeInfinity
      else pairs.map(_.guarantee).sorted(Ordering[Double].reverse)(topK.k - 1)

    var threshold = kthBestGuarantee()
    val initiallyAlive = pairs.filter(_.optimistic >= threshold)
    val pairsPrunedInitial = pairsTotal - initiallyAlive.size

    if (!cfg.useEarlyTermination) {
      // Prune once, then score the survivors exactly.
      val scored = initiallyAlive.map { st =>
        while (!st.done) st.processOneSegment()
        mkPair(st.t1, st.t2, st.exactScoreNow)
      }
      return Result(sortSelect(scored.toSeq),
        PruneStats(pairsTotal, pairsPrunedInitial, 0, segmentsProcessed,
          tuplesCompared, trendCount, summaryDoubles))
    }

    // --- Early termination (Algorithm 2): refine the most promising pair ---
    val pq = mutable.PriorityQueue.empty[PairState](Ordering.by(_.optimistic))
    initiallyAlive.foreach(pq.enqueue(_))
    val results = mutable.ArrayBuffer.empty[ScoredPair]
    var pairsPrunedSearch = 0L
    var sinceRecompute = 0

    while (results.size < topK.k && pq.nonEmpty) {
      val top = pq.dequeue()
      if (top.optimistic < threshold) {
        pairsPrunedSearch += 1 // pruned by a threshold that improved after insertion
      } else if (top.done) {
        results += mkPair(top.t1, top.t2, top.exactScoreNow)
      } else {
        top.processOneSegment()
        sinceRecompute += 1
        if (sinceRecompute >= 256) { threshold = kthBestGuarantee(); sinceRecompute = 0 }
        if (top.optimistic >= threshold) pq.enqueue(top)
        else pairsPrunedSearch += 1
      }
    }

    Result(sortSelect(results.toSeq),
      PruneStats(pairsTotal, pairsPrunedInitial, pairsPrunedSearch,
        segmentsProcessed, tuplesCompared, trendCount, summaryDoubles))
  }
}
