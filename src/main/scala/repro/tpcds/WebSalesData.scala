package repro.tpcds

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic stand-in for TPC-DS `web_sales` (SF100 in the paper) with its
  * PK-FK dimensions `web_page` and `warehouse` — the star-schema shape
  * needed by Table 4's TPC-DS workloads and by rule R1 (push Φ below join).
  *
  * `ws_web_page_sk` (FK) / `wp_web_page_sk` (PK) identify trends; `ws_item_sk`
  * (bucketed) and `ws_sold_date_sk` are groupings; `ws_net_profit` and
  * `ws_quantity` are measures. Referential integrity holds by construction
  * (every FK value has a matching PK row), which R1 relies on.
  */
object WebSalesData {

  def webSales(spark: SparkSession, rows: Long = 500000L, nWebPages: Int = 128,
               nItems: Int = 200, nDays: Int = 366, nWarehouses: Int = 10,
               seed: Long = 11): DataFrame = {
    val id = col("id")
    val page = (id % nWebPages).cast(IntegerType) + 1
    val item = ((id / nWebPages) % nItems).cast(IntegerType) + 1
    val day  = ((id / (nWebPages.toLong * nItems)) % nDays).cast(IntegerType) + 1
    val base = (page % 17).cast(DoubleType)
    val itemEffect = (item % 13).cast(DoubleType) * 0.5
    spark.range(rows).select(
      page.as("ws_web_page_sk"),
      item.as("ws_item_sk"),
      day.as("ws_sold_date_sk"),
      ((id % nWarehouses).cast(IntegerType) + 1).as("ws_warehouse_sk"),
      ((id % 40).cast(IntegerType) + 1).as("ws_quantity"),
      round(base + itemEffect + sin(item * lit(0.37) + (page % 7)) * 5.0 +
        (rand(seed) - 0.5) * 3.0, 2).as("ws_net_profit"),
      round(lit(20.0) + base * 1.7 + (rand(seed + 1) - 0.5) * 6.0, 2).as("ws_sales_price"),
    )
  }

  def webPage(spark: SparkSession, nWebPages: Int = 128): DataFrame =
    spark.range(1, nWebPages + 1).select(
      col("id").cast(IntegerType).as("wp_web_page_sk"),
      (col("id") % 5000 + 100).cast(IntegerType).as("wp_char_count"),
      (col("id") % 30).cast(IntegerType).as("wp_link_count"),
      element_at(array(lit("order"), lit("general"), lit("welcome"), lit("feedback")),
        (col("id") % 4 + 1).cast("int")).as("wp_type"),
    )

  def warehouse(spark: SparkSession, nWarehouses: Int = 10): DataFrame =
    spark.range(1, nWarehouses + 1).select(
      col("id").cast(IntegerType).as("w_warehouse_sk"),
      (col("id") % 90000 + 5000).cast(IntegerType).as("w_sq_ft"),
    )

  /** The 5 (grouping, measure) combinations of Table 4's TPC-DS Q3/Q4:
    * items/days × net profit/quantity.
    */
  def gms5: Seq[repro.core.GroupingMeasure] = {
    import repro.core.{AggKind, GroupingMeasure}
    Seq(
      GroupingMeasure("ws_item_sk", AggKind.Avg, "ws_net_profit"),
      GroupingMeasure("ws_sold_date_sk", AggKind.Avg, "ws_net_profit"),
      GroupingMeasure("ws_item_sk", AggKind.Avg, "ws_quantity"),
      GroupingMeasure("ws_sold_date_sk", AggKind.Avg, "ws_quantity"),
      GroupingMeasure("ws_item_sk", AggKind.Avg, "ws_sales_price"),
    )
  }
}
