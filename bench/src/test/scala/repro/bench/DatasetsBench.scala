package repro.bench

import repro.SparkSpec

/** Table 5: the bench-scale datasets and their shapes. */
class DatasetsBench extends SparkSpec {

  test("Table 5: bench datasets generate at the documented scale") {
    val rows = Experiments.datasets(spark)
    val byName = rows.map(r => r.name -> r).toMap
    assert(byName("Flight-lite").rows ==
      Experiments.FlightAirports.toLong * Experiments.FlightDays * Experiments.FlightRowsPerCell)
    assert(byName("websales-lite").rows == Experiments.TpcdsRows)
    assert(byName("Flight-lite").trends == Experiments.FlightAirports)
    assert(byName("websales-lite").trends == Experiments.TpcdsPages)
  }
}
