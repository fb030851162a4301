package repro.bench

import org.apache.spark.sql.{DataFrame, ReproBridge, SparkSession}
import repro.catalyst._
import repro.core._
import repro.flight.FlightData
import repro.tpcds.WebSalesData
import repro.workload.Workloads
import repro.workload.Workloads.Query

/** The evaluation experiments of §8, one per reported artifact (see
  * DESIGN.md §4 for the artifact ↔ experiment index). Each experiment prints
  * a markdown table with the paper's reported numbers alongside ours and
  * returns structured rows so the bench suites can assert the *shape*
  * (who wins, roughly by how much, where crossovers fall).
  */
object Experiments {
  import BenchHarness._

  // Bench-scale datasets (Table 5 substitution; laptop scale).
  // Scan-heavy regime (several raw rows per aggregated cell), mirroring the
  // paper's 74M-row table where shared scans are the dominant saving.
  val FlightAirports = 160
  val FlightDays = 366
  val FlightRowsPerCell = 12
  val TpcdsRows = 1500000L
  val TpcdsPages = 256
  val TpcdsItems = 200
  val TpcdsDays = 120

  def flightData(spark: SparkSession): DataFrame =
    FlightData.flights(spark, FlightAirports, FlightDays, FlightRowsPerCell)
  def tpcdsData(spark: SparkSession): DataFrame =
    WebSalesData.webSales(spark, TpcdsRows, TpcdsPages, TpcdsItems, TpcdsDays)

  private def materialize(df: DataFrame): DataFrame = { val c = df.cache(); c.count(); c }

  /** Blocking unpersist + GC: leftover cached blocks and garbage from one
    * experiment must not pollute the next one's timings.
    */
  private def release(dfs: DataFrame*): Unit = {
    dfs.foreach(_.unpersist(blocking = true))
    System.gc()
  }

  // ------------------------------------------------------------- Table 5

  final case class DatasetRow(name: String, rows: Long, trends: Long, columns: Int)

  def datasets(spark: SparkSession): Seq[DatasetRow] = {
    val f = materialize(flightData(spark)); val t = materialize(tpcdsData(spark))
    val rows = Seq(
      DatasetRow("Flight-lite", f.count(), FlightAirports.toLong, f.columns.length),
      DatasetRow("websales-lite", t.count(), TpcdsPages.toLong, t.columns.length))
    table("Table 5 (repro): datasets",
      Seq("dataset", "rows", "trend entities", "columns", "paper rows"),
      rows.zip(Seq("74M (8 GB)", "720M (20 GB)")).map { case (r, paper) =>
        Seq(r.name, r.rows.toString, r.trends.toString, r.columns.toString, paper)
      },
      Seq("Paper: Flight 74M rows / 384 airports; TPC-DS SF100 websales 720M rows / 2040 webpages.",
        "Repro runs laptop-scale synthetic data with the same shape (DESIGN.md §1)."))
    release(f, t)
    rows
  }

  // ------------------------------------------------------------- Fig. 9a

  final case class E2ERow(query: String, basic: Double, compare: Double,
                          udf: Double, middleware: Double) {
    def compareSpeedup: Double = basic / compare
    def udfSpeedup: Double = basic / udf
    def middlewareSpeedup: Double = basic / middleware
  }

  /** End-to-end latency of the four approaches on Q1–Q4 (Figure 9a). */
  def endToEnd(spark: SparkSession, dataset: String): Seq[E2ERow] = {
    val (df, queries) = dataset match {
      case "flight" => (materialize(flightData(spark)), Workloads.flightQueries)
      case "tpcds"  => (materialize(tpcdsData(spark)), Workloads.tpcdsQueries)
    }
    CompareSession.install(spark)
    // Warm the execution paths once on the cheapest query.
    runCompare(df, queries.head); runBasic(df, queries.head)
    val rows = queries.map { q =>
      System.gc() // don't charge this query for the previous one's garbage
      val c = runCompare(df, q)
      val b = runBasic(df, q)
      val u = runUdf(df, q)
      val m = runMiddleware(df, q)
      E2ERow(q.id, b, c, u, m)
    }
    val paperSpeedups = dataset match {
      // Figure 9a, approximate (bars read relative to unmodified SQL Server).
      case "flight" => Seq("1.26×", "~4×", "~2×", "~4×")
      case "tpcds"  => Seq("1.36×", "~4×", "~2×", "~4×")
    }
    table(s"Fig. 9a (repro): end-to-end latency, $dataset",
      Seq("query", "SQL-basic (s)", "COMPARE (s)", "UDF (s)", "MIDDLEWARE (s)",
        "COMPARE speedup", "paper COMPARE speedup"),
      rows.zip(paperSpeedups).map { case (r, p) =>
        Seq(r.query, fmtSec(r.basic), fmtSec(r.compare), fmtSec(r.udf), fmtSec(r.middleware),
          fmtX(r.compareSpeedup), p)
      },
      Seq("UDF marshals all aggregates + compares single-threaded; MIDDLEWARE ships " +
        s"aggregates at ${MiddlewareBandwidthMBps.toInt} MB/s (paper's link) and compares client-side."))
    release(df)
    rows
  }

  // ------------------------------------------------------------- Fig. 9b

  final case class AblationRow(query: String, basic: Double, merged: Double,
                               trendwise: Double, pruned: Double, early: Double)

  /** Ablation: each §4/§5 optimization enabled left to right (Figure 9b). */
  def ablation(spark: SparkSession): Seq[AblationRow] = {
    val df = materialize(flightData(spark))
    CompareSession.install(spark)
    // Optimizer statistics computed once, like an engine's catalog stats —
    // Algorithm 1 consumes them, their collection is not part of the query.
    val stats = Some(Stats.collect(df, "airport" +: FlightData.AllGroupings))
    runTrendwise(df, Workloads.flightQ1) // warm
    val rows = Workloads.flightQueries.map { q =>
      AblationRow(q.id,
        runBasic(df, q),
        runMergedOnly(df, q, stats),
        runTrendwise(df, q),
        runPrunedNoET(df, q),
        runCompare(df, q))
    }
    table("Fig. 9b (repro): ablation, flight",
      Seq("query", "basic (s)", "+merged aggs (s)", "+trendwise (s)",
        "+segment pruning (s)", "+early termination (s)"),
      rows.map(r => Seq(r.query, fmtSec(r.basic), fmtSec(r.merged), fmtSec(r.trendwise),
        fmtSec(r.pruned), fmtSec(r.early))),
      Seq("Paper: sharing ≈30% on Q3/Q4 (none available on Q1/Q2), trendwise ≈25%, " +
        "segment-aggregates + early termination a further 20–25%."))
    release(df)
    rows
  }

  // ------------------------------------------------------------- Fig. 10

  final case class SweepRow(x: Long, basic: Option[Double], compare: Double)

  /** Latency vs number of trends (Q2 shape), Figure 10 left. */
  def sensitivityTrends(spark: SparkSession): Seq[SweepRow] = {
    CompareSession.install(spark)
    val rows = Seq(16, 64, 256, 1024).map { nAirports =>
      val df = materialize(FlightData.flights(spark, nAirports, FlightDays, 2))
      val q = Workloads.flightQ2
      val c = runCompare(df, q)
      // The basic plan's trendset join grows superlinearly — skip at the
      // largest point (the paper's point, made by omission).
      val b = if (nAirports <= 256) Some(runBasic(df, q)) else None
      release(df)
      SweepRow(nAirports.toLong, b, c)
    }
    table("Fig. 10 (repro): latency vs number of trends (Q2, flight)",
      Seq("airports (trends)", "SQL-basic (s)", "COMPARE (s)"),
      rows.map(r => Seq(r.x.toString, r.basic.map(fmtSec).getOrElse("— (join too large)"),
        fmtSec(r.compare))),
      Seq("Paper: latency grows for all approaches; growth much steeper without " +
        "trendwise pruning/partitioning."))
    rows
  }

  /** Latency vs number of (grouping, measure) (Q3 shape), Figure 10 middle. */
  def sensitivityGms(spark: SparkSession): Seq[SweepRow] = {
    val df = materialize(flightData(spark))
    CompareSession.install(spark)
    val rows = Seq(1, 5, 10, 20).map { n =>
      val gms = FlightData.gmsN(n)
      // Two fixed airports compared over n (g, m) each (example-1b shape) —
      // one comparison per (g, m), so the sweep isolates aggregate sharing.
      val spec = CompareSpec(
        TrendsetSpec(Seq(ConstraintTerm("airport", Some("A000"))), gms),
        TrendsetSpec(Seq(ConstraintTerm("airport", Some("A001"))), gms),
        Scorer(AggKind.Sum, 2))
      val q = Query(s"Q3-gms$n", spec, Workloads.DefaultK)
      SweepRow(n.toLong, Some(runBasic(df, q)), runCompare(df, q))
    }
    table("Fig. 10 (repro): latency vs number of (grouping, measure) (Q3, flight)",
      Seq("(g, m) count", "SQL-basic (s)", "COMPARE (s)"),
      rows.map(r => Seq(r.x.toString, fmtSec(r.basic.get), fmtSec(r.compare))),
      Seq("Paper: SQL latency grows much faster than COMPARE's (no aggregate sharing)."))
    release(df)
    rows
  }

  /** Number of trends ↑ with total aggregated size fixed, Figure 10 right. */
  def sensitivityFixedSize(spark: SparkSession): Seq[SweepRow] = {
    CompareSession.install(spark)
    val configs = Seq((137, 366), (548, 92), (2192, 23)) // airports × days ≈ 50k
    val rows = configs.map { case (a, d) =>
      val df = materialize(FlightData.flights(spark, a, d, 2))
      val q = Workloads.flightQ2
      val c = runCompare(df, q)
      val b = if (a <= 600) Some(runBasic(df, q)) else None
      release(df)
      SweepRow(a.toLong, b, c)
    }
    table("Fig. 10 (repro): trends ↑, total aggregated size fixed (Q2, flight)",
      Seq("airports (trend size)", "SQL-basic (s)", "COMPARE (s)"),
      rows.zip(configs).map { case (r, (_, d)) =>
        Seq(s"${r.x} ($d days)", r.basic.map(fmtSec).getOrElse("— (join too large)"),
          fmtSec(r.compare))
      },
      Seq("Paper: COMPARE latency first drops (more parallel partitions), then the " +
        "per-partition benefit flattens as partitions become tiny."))
    rows
  }

  // ------------------------------------------------------------- Fig. 11/12

  final case class SegRow(segments: Int, seconds: Double, tuplesCompared: Long,
                          pairsPruned: Long, sturges: Boolean)

  /** Latency vs number of segment aggregates (Figure 11) and the equivalent
    * tuples-per-update view (Figure 12); Q2 over flight.
    */
  def segmentSweep(spark: SparkSession): Seq[SegRow] = {
    val df = materialize(flightData(spark))
    val q = Workloads.flightQ2
    val (t1, t2) = TrendwiseExec.collectTrends(df, q.spec, merge = false)
    val sturgesL = TrendModel.sturges(FlightDays)
    val rows = (Seq(1, 2, 4, sturgesL, 16, 32, 64).distinct.sorted).map { l =>
      val cfg = PrunedTopK.Config(numSegments = Some(l))
      PrunedTopK.run(q.spec, t1, t2, q.topK, cfg) // warm
      val sec = median(3)(PrunedTopK.run(q.spec, t1, t2, q.topK, cfg))
      val stats = PrunedTopK.run(q.spec, t1, t2, q.topK, cfg).stats
      SegRow(l, sec, stats.tuplesCompared, stats.pairsPruned, l == sturgesL)
    }
    table("Fig. 11 (repro): varying number of segment aggregates (Q2, flight)",
      Seq("segments", "Φp time (s)", "tuples compared", "pairs pruned", "Sturges choice"),
      rows.map(r => Seq(r.segments.toString, f"${r.seconds}%.3f", r.tuplesCompared.toString,
        r.pairsPruned.toString, if (r.sturges) "←" else "")),
      Seq("Paper: latency dips then rises again as segment comparisons outgrow pruning " +
        "gains; the Sturges choice ⌊1+log2(n)⌋ sits near the minimum."))
    table("Fig. 12 (repro): tuples compared per bound update (same sweep, inverted knob)",
      Seq("tuples/update (segment size)", "Φp time (s)", "auto choice"),
      rows.reverse.map { r =>
        val segSize = math.ceil(FlightDays.toDouble / r.segments).toInt
        Seq(segSize.toString, f"${r.seconds}%.3f", if (r.sturges) "←" else "")
      },
      Seq("Paper: too few tuples per update → PQ thrash; too many → wasted work on " +
        "low-utility pairs; the automatic n/⌊1+log2(n)⌋ sits near the optimum."))
    release(df)
    rows
  }

  // ------------------------------------------------------------- Fig. 13

  final case class RuleRow(name: String, without: Double, withRule: Double) {
    def gainPct: Double = (without - withRule) / without * 100
  }

  /** R1 (push Φ below PK-FK join) and R2 (push Υ/dedup below Φ), Figure 13. */
  def transformationRules(spark: SparkSession): Seq[RuleRow] = {
    CompareSession.install(spark)
    PkFkHints.register("wp_web_page_sk", "ws_web_page_sk")
    val fact = materialize(tpcdsData(spark))
    val dim = materialize(WebSalesData.webPage(spark, TpcdsPages))
    val joined = fact.join(dim, fact("ws_web_page_sk") === dim("wp_web_page_sk"))

    def dimSpec(fixed: Boolean): CompareSpec = {
      val gms = WebSalesData.gms5
      val c = if (fixed) Seq(ConstraintTerm("wp_web_page_sk", Some("1")))
              else Seq(ConstraintTerm("wp_web_page_sk", None))
      CompareSpec(TrendsetSpec(c, gms), TrendsetSpec(c, gms), Scorer(AggKind.Sum, 2))
    }

    // Best of three: identical plans vary several-fold run to run in a
    // long-lived JVM (GC), and the rule gains at stake are tens of percent.
    def timeNode(node: CompareNode): Double =
      (1 to 3).map(_ => time(ReproBridge.ofRows(spark, node).collect())._2).min

    val r1Rows = Seq("Q3 (fixed page)" -> dimSpec(fixed = true),
      "Q4 (all pages)" -> dimSpec(fixed = false)).map { case (name, spec) =>
      val node = CompareNode(spec, Some(Workloads.DefaultK), ReproBridge.analyzedPlan(joined))
      val without = timeNode(node)
      val pushed = PushCompareBelowJoin(node).asInstanceOf[CompareNode]
      require(pushed.spec != spec, "R1 must fire for this benchmark")
      val withRule = timeNode(pushed)
      RuleRow(s"R1 Φ below ⋈: $name", without, withRule)
    }

    val flight = materialize(FlightData.flights(spark, FlightAirports, FlightDays, 8))
    val maxGm = Seq(GroupingMeasure("day", AggKind.Max, "arrdelay"))
    val r2Rows = Seq(
      "Q1 (one vs all)" -> CompareSpec(
        TrendsetSpec(Seq(ConstraintTerm("airport", Some("A000"))), maxGm),
        TrendsetSpec(Seq(ConstraintTerm("airport", None)), maxGm), Scorer(AggKind.Max, 2)),
      "Q2 (all vs all)" -> CompareSpec(
        TrendsetSpec(Seq(ConstraintTerm("airport", None)), maxGm),
        TrendsetSpec(Seq(ConstraintTerm("airport", None)), maxGm), Scorer(AggKind.Max, 2))
    ).map { case (name, spec) =>
      val node = CompareNode(spec, Some(Workloads.DefaultK), ReproBridge.analyzedPlan(flight))
      val without = timeNode(node)
      val deduped = DedupBelowCompare(node).asInstanceOf[CompareNode]
      require(deduped.child != node.child, "R2 must fire for this benchmark")
      val withRule = timeNode(deduped)
      RuleRow(s"R2 Υ below Φ: $name", without, withRule)
    }

    val rows = r1Rows ++ r2Rows
    table("Fig. 13 (repro): pushdown transformation rules",
      Seq("rule / query", "without rule (s)", "with rule (s)", "gain", "paper gain"),
      rows.zip(Seq("18%", "32%", "14%", "19%")).map { case (r, p) =>
        Seq(r.name, fmtSec(r.without), fmtSec(r.withRule), f"${r.gainPct}%.0f%%", p)
      })
    release(fact, dim, flight)
    rows
  }

  // ------------------------------------------------------------- Fig. 15

  final case class DopRow(partitions: Int, basic: Double, compare: Double)

  /** Latency vs parallelism (shuffle width sweep — the repro analogue of the
    * paper's DOP sweep), Figure 15a; plus Φp memory overhead, Figure 15b.
    */
  def parallelism(spark: SparkSession): (Seq[DopRow], Seq[(String, Long)]) = {
    CompareSession.install(spark)
    val df = materialize(flightData(spark))
    val q = Workloads.flightQ2
    val original = spark.conf.get("spark.sql.shuffle.partitions")
    val dopRows =
      try Seq(1, 4, 16, 64).map { p =>
        spark.conf.set("spark.sql.shuffle.partitions", p.toString)
        DopRow(p, runBasic(df, q), runTrendwise(df, q))
      } finally spark.conf.set("spark.sql.shuffle.partitions", original)
    table("Fig. 15a (repro): latency vs parallelism (shuffle partitions, Q2 flight)",
      Seq("partitions", "SQL-basic (s)", "COMPARE trendwise (s)"),
      dopRows.map(r => Seq(r.partitions.toString, fmtSec(r.basic), fmtSec(r.compare))),
      Seq("Paper: both benefit from DOP up to a point, COMPARE stays 2–3× faster at " +
        "every DOP."))

    val memRows = Workloads.flightQueries.map { qq =>
      runCompare(df, qq)
      qq.id -> lastStats.map(_.summaryBytes).getOrElse(0L)
    }
    val inputBytes = FlightAirports.toLong * FlightDays * FlightRowsPerCell * 60
    table("Fig. 15b (repro): Φp summary-structure memory overhead",
      Seq("query", "summary bytes", "input bytes (approx)", "overhead"),
      memRows.map { case (id, b) =>
        Seq(id, b.toString, inputBytes.toString, f"${b.toDouble / inputBytes * 100}%.3f%%")
      },
      Seq("Paper: < 13% committed-memory overhead; the summary structures themselves " +
        "are O(p·log(n/p)) — tiny relative to the data."))
    release(df)
    (dopRows, memRows)
  }
}
