package repro.bench

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.baselines.{MiddlewareBaseline, UdfBaseline}
import repro.catalyst.{CompareSession, CompareTopKExec}
import repro.core._
import repro.workload.Workloads.Query

/** Timing/reporting utilities and the four execution approaches of §8
  * (unmodified-engine SQL plan, COMPARE, UDF, MIDDLEWARE), each run as a full
  * top-k comparative query (compute scores → order → limit k → collect).
  */
object BenchHarness {

  /** Paper's middleware link: 10 MB/s average (§8 setup). */
  val MiddlewareBandwidthMBps = 10.0

  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** Median wall-clock of `reps` runs (no warmup beyond what the caller did). */
  def median(reps: Int)(f: => Unit): Double = {
    val ts = (1 to reps).map(_ => time(f)._2).sorted
    ts(ts.size / 2)
  }

  /** Best of two runs — engine-path timings in a long-lived shared JVM see
    * large one-sided noise (JIT, GC, adaptive execution), and the minimum is
    * the standard robust estimator for that.
    */
  def best2(f: => Unit): Double = math.min(time(f)._2, time(f)._2)

  // ------------------------------------------------------------- approaches

  /** The unmodified engine: the §4.1 plan the engine picks for hand-written
    * comparative SQL, followed by ORDER BY score LIMIT k.
    */
  def runBasic(df: DataFrame, q: Query): Double = best2 {
    topKCollect(BasicExec.run(df, q.spec), q.topK)
  }

  /** Sharing only (ablation stage 2): merged group-by aggregates, but still
    * the trendset-granularity join. Clears the spooled sub-plans afterwards
    * so cached storage does not leak across timed stages.
    */
  def runMergedOnly(df: DataFrame, q: Query, stats: Option[Stats] = None): Double =
    try best2 {
      topKCollect(Compare.all(df, q.spec, Compare.ExecStrategy.MergedOnly, stats), q.topK)
    } finally TrendwiseExec.clearSpools()

  /** Sharing + trendwise partitioned comparison, exhaustive scoring
    * (ablation stage 3): one shared scan builds the trends, then pairs are
    * compared independently with no summary-based pruning yet.
    */
  def runTrendwise(df: DataFrame, q: Query): Double = best2 {
    val (t1, t2) = repro.catalyst.TrendCollector.collect(df, q.spec)
    PrunedTopK.run(q.spec, t1, t2, q.topK, PrunedTopK.Config(usePruning = false))
  }

  /** + segment-aggregate pruning, no early termination (ablation stage 4). */
  def runPrunedNoET(df: DataFrame, q: Query): Double = best2 {
    val (t1, t2) = repro.catalyst.TrendCollector.collect(df, q.spec)
    PrunedTopK.run(q.spec, t1, t2, q.topK, PrunedTopK.Config(useEarlyTermination = false))
  }

  /** The full COMPARE physical operator (Φp with early termination). */
  def runCompare(df: DataFrame, q: Query): Double = best2 {
    CompareSession.compare(df, q.spec, Some(q.topK)).collect()
  }

  def runUdf(df: DataFrame, q: Query): Double = time {
    UdfBaseline.topK(df, q.spec, q.topK)
  }._2

  def runMiddleware(df: DataFrame, q: Query,
                    bandwidthMBps: Double = MiddlewareBandwidthMBps): Double = time {
    MiddlewareBaseline.topK(df, q.spec, q.topK, bandwidthMBps)
  }._2

  /** Pruning stats of the most recent COMPARE physical execution. */
  def lastStats: Option[PrunedTopK.PruneStats] = CompareTopKExec.lastStats

  private def topKCollect(scored: DataFrame, k: TopK): Array[_] =
    scored.orderBy(if (k.ascending) col("score").asc else col("score").desc)
      .limit(k.k).collect()

  // -------------------------------------------------------------- reporting

  def fmtSec(s: Double): String = f"$s%.2f"
  def fmtX(x: Double): String = f"$x%.2f×"

  /** Print a markdown table (also the format recorded in EXPERIMENTS.md). */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]],
            notes: Seq[String] = Nil): Unit = {
    println()
    println(s"### $title")
    println()
    println(header.mkString("| ", " | ", " |"))
    println(header.map(_ => "---").mkString("| ", " | ", " |"))
    rows.foreach(r => println(r.mkString("| ", " | ", " |")))
    notes.foreach(n => println(s"> $n"))
    println()
  }
}
