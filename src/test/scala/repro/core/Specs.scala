package repro.core

/** Shared comparative-query specs over the [[repro.TestData.sales]] relation,
  * covering all three pair modes (Q1/Q2/Q3-shapes of Table 4 at toy scale)
  * and the paper's running examples (§2.1).
  */
object Specs {
  import AggKind._

  val weekRev: GroupingMeasure    = GroupingMeasure("week", Avg, "revenue")
  val weekProf: GroupingMeasure   = GroupingMeasure("week", Avg, "profit")
  val monthRev: GroupingMeasure   = GroupingMeasure("month", Avg, "revenue")
  val countryProf: GroupingMeasure = GroupingMeasure("country", Avg, "profit")
  val weekQty: GroupingMeasure    = GroupingMeasure("week", Avg, "quantity")

  def scorer(p: Int = 2): Scorer = Scorer(Sum, p)

  /** Example 1a: region 'Asia' overall vs every product within Asia. */
  def ex1a(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("region", Some("Asia"))), Seq(weekRev)),
    TrendsetSpec(Seq(ConstraintTerm("region", Some("Asia")), ConstraintTerm("product", None)), Seq(weekRev)),
    s)

  /** Example 1b: two fixed subsets compared over several (g, m). */
  def ex1b(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("region", Some("Asia"))),
      Seq(weekRev, countryProf, monthRev)),
    TrendsetSpec(Seq(ConstraintTerm("product", Some("P1"))),
      Seq(weekRev, countryProf, monthRev)),
    s)

  /** Example 2a / Q2 shape: all cities vs all cities, one (g, m). */
  def symCities(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(weekRev)),
    TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(weekRev)),
    s)

  /** Q4 shape: all cities vs all cities over several (g, m). */
  def symCitiesMulti(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(weekRev, weekProf, monthRev, weekQty)),
    TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(weekRev, weekProf, monthRev, weekQty)),
    s)

  /** Example 2a variant: Asian cities vs European cities. */
  def asiaVsEurope(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("region", Some("Asia")), ConstraintTerm("city", None)), Seq(weekRev)),
    TrendsetSpec(Seq(ConstraintTerm("region", Some("Europe")), ConstraintTerm("city", None)), Seq(weekRev)),
    s)

  /** Q1 shape: one fixed city vs all cities (identical attribute sets →
    * self-pair excluded).
    */
  def oneVsAll(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(weekRev)),
    TrendsetSpec(Seq(ConstraintTerm("city", Some("City2"))), Seq(weekRev)),
    s)

  /** Q3 shape: one fixed subset against itself with varying attributes
    * (CrossMeasure pair mode).
    */
  def crossMeasure(s: Scorer = scorer()): CompareSpec = CompareSpec(
    TrendsetSpec(Seq(ConstraintTerm("city", Some("City1"))), Seq(weekRev, weekProf, monthRev, weekQty)),
    TrendsetSpec(Seq(ConstraintTerm("city", Some("City1"))), Seq(weekRev, weekProf, monthRev, weekQty)),
    s)

  /** The full grid used by oracle and strategy-equivalence sweeps. */
  def grid: Seq[(String, CompareSpec)] = {
    val shapes: Seq[(String, Scorer => CompareSpec)] = Seq(
      "ex1a" -> (ex1a(_)), "ex1b" -> (ex1b(_)), "symCities" -> (symCities(_)),
      "symCitiesMulti" -> (symCitiesMulti(_)), "asiaVsEurope" -> (asiaVsEurope(_)),
      "oneVsAll" -> (oneVsAll(_)), "crossMeasure" -> (crossMeasure(_)))
    val scorers = Seq(
      Scorer(Sum, 2), Scorer(Sum, 1), Scorer(Avg, 2), Scorer(Avg, 1),
      Scorer(Min, 2), Scorer(Max, 1))
    for ((n, mk) <- shapes; sc <- scorers)
      yield (s"$n/${sc.label}", mk(sc))
  }

  /** A smaller grid (one scorer per shape) for the more expensive sweeps. */
  def gridSmall: Seq[(String, CompareSpec)] = {
    val shapes: Seq[(String, Scorer => CompareSpec)] = Seq(
      "ex1a" -> (ex1a(_)), "ex1b" -> (ex1b(_)), "symCities" -> (symCities(_)),
      "symCitiesMulti" -> (symCitiesMulti(_)), "asiaVsEurope" -> (asiaVsEurope(_)),
      "oneVsAll" -> (oneVsAll(_)), "crossMeasure" -> (crossMeasure(_)))
    shapes.map { case (n, mk) => (s"$n/SUM OVER DIFF(2)", mk(Scorer(Sum, 2))) }
  }
}
