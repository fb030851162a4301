package repro.catalyst

import org.apache.spark.sql.{DataFrame, ReproBridge, SparkSession, SparkSessionExtensions}
import repro.core.{CompareSpec, PrunedTopK, TopK}

/** Installs the COMPARE extensions on a session.
  *
  * Two paths (§7 "these optimizations can be incorporated in other database
  * engines supporting cost-based optimizations and addition of new
  * transformation rules"):
  *
  *   - [[CompareExtensions]] — `SparkSessionExtensions` builder for sessions
  *     created with `.withExtensions(new CompareExtensions)` (also injects
  *     the COMPARE SQL parser);
  *   - [[CompareSession.install]] — runtime injection through
  *     `spark.experimental`, used by tests whose shared session predates
  *     extension wiring.
  *
  * Rule R5 ([[ReduceToCompare]]) is opt-in: it rewrites *user* plans that
  * happen to match the comparative shape, which callers must ask for.
  */
object CompareSession {

  def install(spark: SparkSession, withR5: Boolean = false): Unit = synchronized {
    if (!spark.experimental.extraStrategies.exists(_.isInstanceOf[CompareStrategy]))
      spark.experimental.extraStrategies = new CompareStrategy() +: spark.experimental.extraStrategies
    val rules = baseRules ++ (if (withR5) Seq(ReduceToCompare) else Nil)
    val present = spark.experimental.extraOptimizations.toSet
    spark.experimental.extraOptimizations =
      spark.experimental.extraOptimizations ++ rules.filterNot(present.contains)
  }

  def uninstallR5(spark: SparkSession): Unit = synchronized {
    spark.experimental.extraOptimizations =
      spark.experimental.extraOptimizations.filterNot(_ == ReduceToCompare)
  }

  private def baseRules = Seq(PushCompareBelowJoin, PushFilterBelowCompare, DedupBelowCompare)

  /** Build a DataFrame whose plan is Φ over `df` — the logical-operator
    * entry point (planned by [[CompareStrategy]] into [[CompareTopKExec]]).
    */
  def compare(df: DataFrame, spec: CompareSpec, topK: Option[TopK] = None): DataFrame = {
    val spark = df.sparkSession
    install(spark)
    ReproBridge.ofRows(spark, CompareNode(spec, topK, ReproBridge.analyzedPlan(df)))
  }
}

/** `SparkSessionExtensions` builder: strategy, rules (R1–R3), and the
  * COMPARE SQL parser.
  */
class CompareExtensions extends (SparkSessionExtensions => Unit) {
  override def apply(ext: SparkSessionExtensions): Unit = {
    ext.injectPlannerStrategy(_ => new CompareStrategy(PrunedTopK.Config()))
    ext.injectOptimizerRule(_ => PushCompareBelowJoin)
    ext.injectOptimizerRule(_ => PushFilterBelowCompare)
    ext.injectOptimizerRule(_ => DedupBelowCompare)
    ext.injectParser((_, delegate) => new CompareSqlParser(delegate))
  }
}
