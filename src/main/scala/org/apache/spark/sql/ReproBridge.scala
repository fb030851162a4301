package org.apache.spark.sql

import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan

/** Narrow bridge to `private[sql]` members of the classic Spark session —
  * the reproduction needs to wrap a hand-built logical plan into a DataFrame
  * ([[classic.Dataset.ofRows]]) and to read a DataFrame's analyzed plan.
  */
object ReproBridge {
  def ofRows(spark: SparkSession, plan: LogicalPlan): DataFrame =
    classic.Dataset.ofRows(spark.asInstanceOf[classic.SparkSession], plan)

  def analyzedPlan(df: DataFrame): LogicalPlan =
    df.asInstanceOf[classic.Dataset[Row]].queryExecution.analyzed

  def optimizedPlan(df: DataFrame): LogicalPlan =
    df.asInstanceOf[classic.Dataset[Row]].queryExecution.optimizedPlan

  def executedPlan(df: DataFrame): org.apache.spark.sql.execution.SparkPlan =
    df.asInstanceOf[classic.Dataset[Row]].queryExecution.executedPlan

  def sqlParser(spark: SparkSession): org.apache.spark.sql.catalyst.parser.ParserInterface =
    spark.asInstanceOf[classic.SparkSession].sessionState.sqlParser

  /** InternalRow RDD of a DataFrame plus the attributes describing its rows. */
  def internalRdd(df: DataFrame): (org.apache.spark.rdd.RDD[org.apache.spark.sql.catalyst.InternalRow],
                                   Seq[org.apache.spark.sql.catalyst.expressions.Attribute]) = {
    val qe = df.asInstanceOf[classic.Dataset[Row]].queryExecution
    (qe.toRdd, qe.analyzed.output)
  }
}
