package repro.core

import repro.{SparkSpec, TestData, TestUtil}

/** Correctness of the §4.1 basic plan against the DuckDB oracle: every
  * (shape × scorer) in the grid is executed by [[BasicExec]] and compared to
  * the verbose Figure-3-style SQL run on DuckDB.
  */
class BasicExecOracleSpec extends SparkSpec {

  private lazy val sales = TestData.sales(spark, rows = 2000).cache()

  for ((name, spec) <- Specs.grid) {
    test(s"basic plan matches DuckDB oracle: $name") {
      TestUtil.checkOracle(BasicExec.run(sales, spec), spec, "sales", sales)
    }
  }

  test("basic plan emits no self-pairs for one-vs-all shapes") {
    val rows = BasicExec.run(sales, Specs.oneVsAll()).collect()
    assert(rows.nonEmpty)
    assert(!rows.exists(r => r.getAs[String]("city_1") == r.getAs[String]("city_2")))
  }

  test("basic plan emits each symmetric pair once, canonically ordered") {
    val rows = BasicExec.run(sales, Specs.symCities()).collect()
    assert(rows.length == 8 * 7 / 2)
    rows.foreach(r => assert(r.getAs[String]("city_1") < r.getAs[String]("city_2")))
  }

  test("basic plan surfaces fixed constraints as constant columns (Table 1)") {
    val rows = BasicExec.run(sales, Specs.ex1a()).collect()
    assert(rows.nonEmpty)
    rows.foreach { r =>
      assert(r.getAs[String]("region_1") == "Asia")
      assert(r.getAs[String]("region_2") == "Asia")
    }
  }

  test("basic plan has one row per product for example 1a") {
    val rows = BasicExec.run(sales, Specs.ex1a()).collect()
    assert(rows.map(_.getAs[String]("product_2")).sorted.toSeq ==
      (0 until 6).map(i => s"P$i"))
  }

  test("basic plan has one row per (g, m) for example 1b") {
    val rows = BasicExec.run(sales, Specs.ex1b()).collect()
    assert(rows.length == 3)
    assert(rows.map(_.getAs[String]("grouping")).sorted.toSeq == Seq("country", "month", "week"))
  }
}
