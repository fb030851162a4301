package repro.flight

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-in for the Flight dataset of §8 (stat-computing.org ASA
  * dataexpo; 74M rows, 384 airports in the paper).
  *
  * Shape-preserving substitution (see DESIGN.md §1): `airport` is the
  * trend/constraint column; `day` (1..nDays, dense per airport) and `week`
  * are the grouping columns; five delay measures follow
  * per-airport base + seasonal + noise structure, so different airports have
  * genuinely different trends (which is what drives pruning-bound tightness
  * and top-k separability). Deterministic in (parameters, seed).
  */
object FlightData {

  val Measures: Seq[String] = Seq("arrdelay", "depdelay", "weatherdelay", "carrierdelay", "nasdelay")
  val Groupings: Seq[String] = Seq("day", "week")
  /** All groupings, including the coarser ones used by the Figure-10 sweep. */
  val AllGroupings: Seq[String] = Seq("day", "week", "month", "dow")

  /** Generate `nAirports × nDays × rowsPerCell` raw flight rows. */
  def flights(spark: SparkSession, nAirports: Int = 64, nDays: Int = 366,
              rowsPerCell: Int = 3, seed: Long = 7): DataFrame = {
    val n = nAirports.toLong * nDays * rowsPerCell
    val id = col("id")
    val airportIdx = (id % nAirports).cast(IntegerType)
    val day = ((id / nAirports) % nDays).cast(IntegerType) + 1
    // Per-airport structure: base level, seasonal amplitude and phase derived
    // from the airport index (deterministic), plus uniform noise.
    val base  = (airportIdx % 23).cast(DoubleType) + lit(5.0)
    val amp   = (airportIdx % 7).cast(DoubleType) + lit(2.0)
    val phase = (airportIdx % 11).cast(DoubleType)
    def measure(k: Int): org.apache.spark.sql.Column = {
      val seasonal = amp * sin(day * lit(2 * math.Pi / nDays) + phase + lit(k))
      val noise = (rand(seed + k) - 0.5) * 4.0
      round(base + lit(k * 1.5) + seasonal + noise, 2)
    }
    spark.range(n).select(
      format_string("A%03d", airportIdx).as("airport"),
      day.as("day"),
      (((day - 1) / 7) + 1).cast(IntegerType).as("week"),
      (((day - 1) / 31) + 1).cast(IntegerType).as("month"),
      (((day - 1) % 7) + 1).cast(IntegerType).as("dow"),
      measure(0).as("arrdelay"),
      measure(1).as("depdelay"),
      measure(2).as("weatherdelay"),
      measure(3).as("carrierdelay"),
      measure(4).as("nasdelay"),
    )
  }

  /** The 10 (grouping, measure) combinations used by Q3/Q4 on Flight
    * (Table 4): {day, week} × five AVG(delay) measures.
    */
  def gms10: Seq[repro.core.GroupingMeasure] =
    for (g <- Groupings; m <- Measures)
      yield repro.core.GroupingMeasure(g, repro.core.AggKind.Avg, m)

  /** First `n` (grouping, measure) combinations over all four groupings —
    * up to 20, for the Figure-10 "number of (grouping, measure)" sweep.
    */
  def gmsN(n: Int): Seq[repro.core.GroupingMeasure] = {
    val all = for (g <- AllGroupings; m <- Measures)
      yield repro.core.GroupingMeasure(g, repro.core.AggKind.Avg, m)
    require(n >= 1 && n <= all.size, s"n must be in [1, ${all.size}]")
    all.take(n)
  }
}
