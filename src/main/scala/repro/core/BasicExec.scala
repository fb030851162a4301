package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Basic execution strategy (§4.1) — the plan relational engines generate for
  * hand-written comparative SQL (Figure 3):
  *
  *   1. one group-by aggregate per (grouping, measure) (no sharing),
  *   2. a join at *trendset* granularity on equal grouping values,
  *   3. per-pair aggregation with the scorer,
  *   4. UNION ALL across (grouping, measure) combinations.
  *
  * This doubles as the "unmodified engine" baseline of §8: it is exactly what
  * the engine does without the COMPARE optimizations.
  */
object BasicExec {

  /** Full pair scoring in the core output schema of [[CompareOutput]]. */
  def run(df: DataFrame, spec: CompareSpec): DataFrame = {
    val perGm = spec.comparableGmPairs.map { case (i, j) =>
      val gm1 = spec.t1.gms(i); val gm2 = spec.t2.gms(j)
      val left  = Relations.trendRel(df, spec.t1, gm1, side = 1)
      val right = Relations.trendRel(df, spec.t2, gm2, side = 2)
      val joined = left.join(right, Relations.pairCondition(spec, left, right))
      val cCols = (CompareOutput.c1Cols(spec) ++ CompareOutput.c2Cols(spec)).map(col)
      joined
        .groupBy(cCols: _*)
        .agg(Relations.scoreAgg(spec.scorer, col("__v1") - col("__v2")).as("score"))
        .withColumn("grouping", lit(gm1.grouping))
        .withColumn("measure_1", lit(gm1.measureLabel))
        .withColumn("measure_2", lit(gm2.measureLabel))
        .select(CompareOutput.columns(spec).map(col): _*)
    }
    if (perGm.isEmpty) emptyResult(df, spec) else perGm.reduce(_.unionAll(_))
  }

  /** Zero comparable (g, m) pairs (e.g. a cross-measure spec with a single
    * (g, m)): an empty relation in the COMPARE output schema.
    */
  private[core] def emptyResult(df: DataFrame, spec: CompareSpec): DataFrame =
    df.sparkSession.createDataFrame(
      df.sparkSession.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      CompareOutput.schema(spec))
}
