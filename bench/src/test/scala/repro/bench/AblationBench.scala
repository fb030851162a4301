package repro.bench

import repro.SparkSpec

/** Figure 9b: each optimization stage (merged aggregates → trendwise →
  * segment pruning → early termination) must not regress, and the fully
  * optimized operator must clearly beat the basic plan.
  */
class AblationBench extends SparkSpec {

  test("Fig 9b: successive optimizations improve Q2/Q4; sharing helps Q3/Q4") {
    val rows = Experiments.ablation(spark)
    val byQ = rows.map(r => r.query -> r).toMap
    // Fully optimized beats basic everywhere (noise-tolerant on the cheap Q3).
    rows.foreach { r =>
      assert(r.early < r.basic, s"${r.query}: ${r.early}s should beat basic ${r.basic}s")
    }
    // Trendwise processing is the big win on many-to-many queries.
    for (q <- Seq("Flight-Q2", "Flight-Q4")) {
      assert(byQ(q).trendwise < byQ(q).basic,
        s"$q: trendwise ${byQ(q).trendwise}s vs basic ${byQ(q).basic}s")
    }
    // Aggregate sharing only applies where multiple (g, m) share scans (Q3/Q4).
    assert(byQ("Flight-Q4").merged < byQ("Flight-Q4").basic)
  }
}
