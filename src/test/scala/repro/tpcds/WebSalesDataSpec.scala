package repro.tpcds

import repro.SparkSpec

/** Sanity checks for the synthetic TPC-DS websales star schema. */
class WebSalesDataSpec extends SparkSpec {

  private lazy val fact = WebSalesData.webSales(spark, rows = 20000, nWebPages = 16,
    nItems = 30, nDays = 25).cache()
  private lazy val pages = WebSalesData.webPage(spark, nWebPages = 16).cache()

  test("fact row count and key ranges") {
    assert(fact.count() == 20000)
    import org.apache.spark.sql.functions._
    val r = fact.agg(min("ws_web_page_sk"), max("ws_web_page_sk"),
      min("ws_item_sk"), max("ws_item_sk")).collect()(0)
    assert(r.getInt(0) >= 1 && r.getInt(1) <= 16)
    assert(r.getInt(2) >= 1 && r.getInt(3) <= 30)
  }

  test("referential integrity: every fact FK has a dimension PK (R1's premise)") {
    val orphans = fact.join(pages,
      fact("ws_web_page_sk") === pages("wp_web_page_sk"), "left_anti").count()
    assert(orphans == 0)
  }

  test("web_page PK is unique") {
    assert(pages.select("wp_web_page_sk").distinct().count() == pages.count())
  }

  test("warehouse dimension generates") {
    val w = WebSalesData.warehouse(spark, 7)
    assert(w.count() == 7)
    assert(w.columns.toSet == Set("w_warehouse_sk", "w_sq_ft"))
  }

  test("webpages have distinct profit trends") {
    import org.apache.spark.sql.functions._
    val perPage = fact.groupBy("ws_web_page_sk").agg(avg("ws_net_profit").as("m"))
      .collect().map(_.getAs[Double]("m"))
    assert(perPage.distinct.length > 8)
  }

  test("gms5 is the Table-4 5-combination workload over existing columns") {
    assert(WebSalesData.gms5.size == 5)
    val cols = fact.columns.toSet
    WebSalesData.gms5.foreach { gm =>
      assert(cols.contains(gm.grouping), gm.grouping)
      assert(cols.contains(gm.measure), gm.measure)
    }
  }
}
