package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Small deterministic "sales" relation shaped like the paper's running
  * example (§2.1): regions, cities, products, week/month/country dimensions,
  * revenue/profit/quantity measures. Dense enough that every (city, week)
  * cell exists, which mirrors the dense-trend OLAP setting of the paper.
  */
object TestData {

  def sales(spark: SparkSession, rows: Int = 4000, seed: Long = 1): DataFrame = {
    val id = col("id")
    val cityIdx = (id % 8).cast(IntegerType)
    val region  = when(cityIdx < 4, "Asia").otherwise("Europe")
    val week    = ((id / 8) % 12).cast(IntegerType) + 1
    spark.range(rows).select(
      region.as("region"),
      concat(lit("City"), cityIdx).as("city"),
      concat(lit("P"), (id % 6).cast(IntegerType)).as("product"),
      week.as("week"),
      (((week - 1) / 3) + 1).cast(IntegerType).as("month"),
      concat(lit("Ctry"), (id % 4).cast(IntegerType)).as("country"),
      round((cityIdx + 1) * 10 + sin(week * lit(0.7) + cityIdx) * 8 + (rand(seed) - 0.5) * 4, 2)
        .as("revenue"),
      round((cityIdx + 1) * 4 + cos(week * lit(0.5) + cityIdx) * 5 + (rand(seed + 1) - 0.5) * 3, 2)
        .as("profit"),
      ((id % 50) + 1).cast(DoubleType).as("quantity"),
    )
  }
}
