package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Pure unit tests for the comparative-expression AST (§2.2, §3.1). */
class ModelSpec extends AnyFunSuite {
  import AggKind._

  test("AggKind.parse accepts all aggregate names case-insensitively") {
    assert(AggKind.parse("sum") == Sum)
    assert(AggKind.parse("AVG") == Avg)
    assert(AggKind.parse("Min") == Min)
    assert(AggKind.parse("mAx") == Max)
  }

  test("AggKind.parse rejects unknown aggregates") {
    assertThrows[IllegalArgumentException](AggKind.parse("MEDIAN"))
  }

  test("GroupingMeasure renders its measure label like the paper's output tables") {
    assert(GroupingMeasure("week", Avg, "revenue").measureLabel == "AVG(revenue)")
  }

  test("Scorer.diff implements DIFF(m1, m2, p) = |m1 - m2|^p") {
    assert(Scorer(Sum, 2).diff(3.0, 5.0) == 4.0)
    assert(Scorer(Sum, 1).diff(3.0, 5.0) == 2.0)
    assert(Scorer(Sum, 3).diff(5.0, 3.0) == 8.0)
  }

  test("Scorer.diff is symmetric for every p (absolute value)") {
    val rnd = new scala.util.Random(42)
    for (_ <- 1 to 200; p <- 1 to 3) {
      val a = rnd.nextDouble() * 2000 - 1000
      val b = rnd.nextDouble() * 2000 - 1000
      val s = Scorer(Sum, p)
      assert(s.diff(a, b) == s.diff(b, a))
    }
  }

  test("Scorer rejects non-positive DIFF exponents") {
    assertThrows[IllegalArgumentException](Scorer(Sum, 0))
  }

  test("TopK rejects non-positive k") {
    assertThrows[IllegalArgumentException](TopK(0, ascending = true))
  }

  test("TrendsetSpec rejects duplicate constraint attributes") {
    assertThrows[IllegalArgumentException](
      TrendsetSpec(Seq(ConstraintTerm("city", None), ConstraintTerm("city", Some("x"))),
        Seq(Specs.weekRev)))
  }

  test("TrendsetSpec splits free and fixed constraint terms") {
    val ts = TrendsetSpec(
      Seq(ConstraintTerm("region", Some("Asia")), ConstraintTerm("product", None)),
      Seq(Specs.weekRev))
    assert(ts.freeAttrs == Seq("product"))
    assert(ts.fixedTerms == Seq(("region", "Asia")))
    assert(!ts.isFullyFixed)
  }

  test("pair mode: different constraints => CrossConstraint") {
    assert(Specs.ex1a().pairMode == PairMode.CrossConstraint)
    assert(Specs.asiaVsEurope().pairMode == PairMode.CrossConstraint)
  }

  test("pair mode: identical varying constraints => SymmetricConstraint") {
    assert(Specs.symCities().pairMode == PairMode.SymmetricConstraint)
    assert(Specs.symCitiesMulti().pairMode == PairMode.SymmetricConstraint)
  }

  test("pair mode: identical fully-fixed constraints => CrossMeasure") {
    assert(Specs.crossMeasure().pairMode == PairMode.CrossMeasure)
  }

  test("comparable gm pairs are the diagonal for cross/symmetric modes") {
    assert(Specs.ex1b().comparableGmPairs == Seq((0, 0), (1, 1), (2, 2)))
    assert(Specs.symCitiesMulti().comparableGmPairs == Seq((0, 0), (1, 1), (2, 2), (3, 3)))
  }

  test("CrossMeasure pairs share the grouping column and differ in measure") {
    val pairs = Specs.crossMeasure().comparableGmPairs
    val gms = Specs.crossMeasure().t1.gms
    // weekRev-weekProf, weekRev-weekQty, weekProf-weekQty — monthRev pairs with nothing.
    assert(pairs == Seq((0, 1), (0, 3), (1, 3)))
    pairs.foreach { case (i, j) =>
      assert(gms(i).grouping == gms(j).grouping)
      assert(gms(i) != gms(j))
    }
  }

  test("identical attribute sets trigger self-pair exclusion (R_i.c != R_j.c)") {
    assert(Specs.oneVsAll().excludeIdenticalConstraint)
    assert(Specs.symCities().excludeIdenticalConstraint)
    assert(!Specs.ex1a().excludeIdenticalConstraint)
  }

  test("mismatched gm lists across differing constraints are rejected") {
    assertThrows[IllegalArgumentException] {
      CompareSpec(
        TrendsetSpec(Seq(ConstraintTerm("city", None)), Seq(Specs.weekRev)),
        TrendsetSpec(Seq(ConstraintTerm("product", None)), Seq(Specs.weekProf)),
        Specs.scorer())
    }
  }

  test("referencedColumns covers constraints, groupings and measures") {
    assert(Specs.ex1a().referencedColumns.toSet ==
      Set("region", "product", "week", "revenue"))
  }

  test("output columns: constraint sides, pair labels, score") {
    assert(CompareOutput.columns(Specs.ex1a()) ==
      Seq("region_1", "region_2", "product_2", "grouping", "measure_1", "measure_2", "score"))
  }

  test("output schema types: strings + double score") {
    val sch = CompareOutput.schema(Specs.symCities())
    assert(sch.fields.map(_.name).toSeq == Seq("city_1", "city_2", "grouping", "measure_1", "measure_2", "score"))
    assert(sch.fields.last.dataType == org.apache.spark.sql.types.DoubleType)
  }

  test("spec toString round-trips the USING clause label") {
    assert(Specs.ex1a().toString.contains("USING SUM OVER DIFF(2)"))
  }
}
