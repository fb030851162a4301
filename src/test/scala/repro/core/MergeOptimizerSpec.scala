package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the greedy merge of group-by aggregates (§4.2, Algorithm 1)
  * and its statistics-driven cost model.
  */
class MergeOptimizerSpec extends AnyFunSuite {
  import AggKind._

  private def ts(gms: GroupingMeasure*): TrendsetSpec =
    TrendsetSpec(Seq(ConstraintTerm("city", None)), gms)

  private val dayRev  = GroupingMeasure("day", Avg, "revenue")
  private val dayProf = GroupingMeasure("day", Avg, "profit")
  private val weekRev = GroupingMeasure("week", Avg, "revenue")
  private val idRev   = GroupingMeasure("id", Avg, "revenue") // near-unique grouping

  test("groupCount caps the independence estimate at the row count") {
    val st = Stats(1000, Map("a" -> 100, "b" -> 100))
    assert(st.groupCount(Seq("a")) == 100)
    assert(st.groupCount(Seq("a", "b")) == 1000)
  }

  test("groupCount ignores duplicate columns") {
    val st = Stats(1000, Map("a" -> 10))
    assert(st.groupCount(Seq("a", "a")) == 10)
  }

  test("distinctOf defaults to row count for unknown columns") {
    assert(Stats(50, Map.empty).distinctOf("x") == 50)
  }

  test("same-grouping aggregates always merge (shared scan, same output)") {
    val spec = ts(dayRev, dayProf)
    val st = Stats(100000, Map("city" -> 10, "day" -> 366))
    assert(MergeOptimizer.optimize(spec, st) == Seq(Seq(0, 1)))
  }

  test("correlated groupings merge when the merged output stays small") {
    val spec = ts(dayRev, weekRev)
    // day ⊇ week correlation: merged group-by (day, week) ≈ |day| groups.
    val st = Stats(1000000, Map("city" -> 10, "day" -> 366, "week" -> 53))
    val groups = MergeOptimizer.optimize(spec, st)
    assert(groups == Seq(Seq(0, 1)))
  }

  test("merging stops when the merged output would explode (Figure 5a's dip)") {
    // Two independent high-cardinality groupings: the merged group-by output
    // grows multiplicatively (5000 × 5000 × city, capped at 10M rows), which
    // costs more in partitioning than the saved scan — so Algorithm 1 keeps
    // the sub-plans separate.
    val g1 = GroupingMeasure("sku", Avg, "revenue")
    val g2 = GroupingMeasure("zip", Avg, "revenue")
    val spec = ts(g1, g2)
    val st = Stats(10000000L, Map("city" -> 10, "sku" -> 5000, "zip" -> 5000))
    val groups = MergeOptimizer.optimize(spec, st)
    assert(groups.toSet == Set(Seq(0), Seq(1)))
  }

  test("plan cost decreases monotonically along the greedy merge path") {
    val spec = ts(dayRev, dayProf, weekRev)
    val st = Stats(500000, Map("city" -> 20, "day" -> 366, "week" -> 53))
    val merged = MergeOptimizer.optimize(spec, st)
    val unmergedCost = MergeOptimizer.planCost(spec, spec.gms.indices.map(Seq(_)), st)
    val mergedCost = MergeOptimizer.planCost(spec, merged, st)
    assert(mergedCost <= unmergedCost)
  }

  test("optimize returns a partition of all gm indices") {
    val spec = ts(dayRev, dayProf, weekRev, idRev)
    val st = Stats(200000, Map("city" -> 10, "day" -> 366, "week" -> 53, "id" -> 200000))
    val groups = MergeOptimizer.optimize(spec, st)
    assert(groups.flatten.sorted == Seq(0, 1, 2, 3))
    assert(groups.flatten.distinct.size == 4)
  }

  test("single (g, m) trivially yields one singleton sub-plan") {
    val spec = ts(dayRev)
    assert(MergeOptimizer.optimize(spec, Stats(100, Map.empty)) == Seq(Seq(0)))
  }
}
