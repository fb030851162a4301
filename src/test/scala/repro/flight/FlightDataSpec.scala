package repro.flight

import repro.SparkSpec

/** Sanity checks for the synthetic Flight dataset (§8 substitution). */
class FlightDataSpec extends SparkSpec {

  private lazy val df = FlightData.flights(spark, nAirports = 8, nDays = 30, rowsPerCell = 2).cache()

  test("row count = airports × days × rowsPerCell") {
    assert(df.count() == 8L * 30 * 2)
  }

  test("schema has the five delay measures and four groupings") {
    assert(df.columns.toSet ==
      Set("airport") ++ FlightData.AllGroupings ++ FlightData.Measures)
  }

  test("gmsN caps at 20 combinations and validates its argument") {
    assert(FlightData.gmsN(20).size == 20)
    assert(FlightData.gmsN(1) == FlightData.gmsN(20).take(1))
    assertThrows[IllegalArgumentException](FlightData.gmsN(21))
  }

  test("every airport is dense over the day domain (drives pruning bounds)") {
    import org.apache.spark.sql.functions._
    val counts = df.groupBy("airport").agg(countDistinct("day").as("d")).collect()
    assert(counts.length == 8)
    counts.foreach(r => assert(r.getAs[Long]("d") == 30))
  }

  test("week is derived from day") {
    import org.apache.spark.sql.functions._
    val bad = df.where(col("week") =!= ((col("day") - 1) / 7).cast("int") + 1).count()
    assert(bad == 0)
  }

  test("airports have distinct trend structure (not all identical)") {
    import org.apache.spark.sql.functions._
    val perAirport = df.groupBy("airport").agg(avg("arrdelay").as("m"))
      .collect().map(_.getAs[Double]("m"))
    assert(perAirport.distinct.length > 4)
  }

  test("generation is deterministic in the seed") {
    val a = FlightData.flights(spark, 4, 10, 1, seed = 3).collect().map(_.toString).sorted.toSeq
    val b = FlightData.flights(spark, 4, 10, 1, seed = 3).collect().map(_.toString).sorted.toSeq
    assert(a == b)
  }

  test("gms10 is the Table-4 10-combination workload") {
    assert(FlightData.gms10.size == 10)
    assert(FlightData.gms10.map(_.grouping).distinct == Seq("day", "week"))
    assert(FlightData.gms10.map(_.measure).distinct.size == 5)
  }
}
