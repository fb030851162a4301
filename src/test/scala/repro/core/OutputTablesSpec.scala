package repro.core

import repro.{SparkSpec, TestData}

/** Reproduces the *semantics* of the paper's output Tables 1 and 2 (§3.1):
  * identity columns for the compared trends plus Boolean flags marking which
  * (grouping, measure) each row compared.
  */
class OutputTablesSpec extends SparkSpec {

  private lazy val sales = TestData.sales(spark, rows = 1500).cache()

  test("Table 1 shape (example 1a): R1/P identify trends, W and V always true") {
    val spec = Specs.ex1a()
    val flags = CompareOutput.flagsView(spec, BasicExec.run(sales, spec))
    assert(flags.columns.toSeq ==
      Seq("region_1", "region_2", "product_2", "week", "AVG(revenue)", "score"))
    val rows = flags.collect()
    assert(rows.length == 6) // one per product
    rows.foreach { r =>
      assert(r.getAs[String]("region_1") == "Asia")
      assert(r.getAs[Boolean]("week"))
      assert(r.getAs[Boolean]("AVG(revenue)"))
      assert(r.getAs[Double]("score") >= 0.0)
    }
  }

  test("Table 2 shape (example 1b): exactly one grouping flag true per row") {
    val spec = Specs.ex1b()
    val flags = CompareOutput.flagsView(spec, BasicExec.run(sales, spec))
    val gCols = Seq("week", "country", "month")
    val rows = flags.collect()
    assert(rows.length == 3) // one per (g, m)
    rows.foreach { r =>
      val on = gCols.count(r.getAs[Boolean])
      assert(on == 1, s"row $r should flag exactly one grouping")
    }
    // Measure flags: AVG(revenue) rows are the week/month ones, AVG(profit)
    // the country one.
    assert(rows.count(_.getAs[Boolean]("AVG(revenue)")) == 2)
    assert(rows.count(_.getAs[Boolean]("AVG(profit)")) == 1)
  }

  test("flags view marks both measures for cross-measure pairs (Q3 shape)") {
    val spec = Specs.crossMeasure()
    val flags = CompareOutput.flagsView(spec, BasicExec.run(sales, spec))
    val rows = flags.collect()
    assert(rows.length == spec.comparableGmPairs.size)
    rows.foreach { r =>
      val measureFlags = Seq("AVG(revenue)", "AVG(profit)", "AVG(quantity)")
        .count(c => flags.columns.contains(c) && r.getAs[Boolean](c))
      assert(measureFlags == 2, s"cross-measure row must flag two measures: $r")
    }
  }

  test("toDf materializes scored pairs in the core schema") {
    val spec = Specs.symCities()
    val pairs = Seq(ScoredPair(Seq("City0"), Seq("City1"), 0, 0, 12.5))
    val df = CompareOutput.toDf(spark, spec, pairs)
    val r = df.collect().head
    assert(r.getAs[String]("city_1") == "City0")
    assert(r.getAs[String]("city_2") == "City1")
    assert(r.getAs[String]("grouping") == "week")
    assert(r.getAs[String]("measure_1") == "AVG(revenue)")
    assert(r.getAs[Double]("score") == 12.5)
  }
}
