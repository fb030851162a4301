package repro.bench

import repro.SparkSpec

/** Figure 10: latency as data characteristics scale — number of trends,
  * number of (grouping, measure) combinations, and trends↑ at fixed size.
  */
class DataSensitivityBench extends SparkSpec {

  test("Fig 10: latency grows with the number of trends; COMPARE stays ahead") {
    val rows = Experiments.sensitivityTrends(spark)
    // COMPARE latency grows with trend count (weakly monotone over the sweep).
    assert(rows.last.compare > rows.head.compare * 0.5)
    // At the largest point where both run, COMPARE wins.
    val both = rows.filter(_.basic.isDefined)
    assert(both.nonEmpty)
    assert(both.last.compare < both.last.basic.get,
      s"COMPARE ${both.last.compare}s vs basic ${both.last.basic.get}s at ${both.last.x} trends")
  }

  test("Fig 10: SQL latency grows faster than COMPARE's with the (g,m) count") {
    val rows = Experiments.sensitivityGms(spark)
    val first = rows.head; val last = rows.last
    val basicGrowth = last.basic.get / first.basic.get.max(0.01)
    val compareGrowth = last.compare / first.compare.max(0.01)
    assert(basicGrowth > compareGrowth,
      s"basic grew ${basicGrowth}× vs compare ${compareGrowth}× from 1 to 20 (g,m)s")
  }

  test("Fig 10: fixed total size — COMPARE handles many small trends") {
    val rows = Experiments.sensitivityFixedSize(spark)
    assert(rows.size == 3)
    // COMPARE completes everywhere, including where the basic join is skipped.
    rows.foreach(r => assert(r.compare > 0))
    val both = rows.filter(_.basic.isDefined)
    assert(both.forall(r => r.compare < r.basic.get))
  }
}
