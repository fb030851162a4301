package repro.bench

import repro.SparkSpec

/** Figure 13: R1 (push Φ below PK-FK join) and R2 (push dedup-aggregate
  * below Φ) must deliver real wall-clock gains on the star-schema and
  * duplicate-heavy workloads respectively.
  */
class TransformationRulesBench extends SparkSpec {

  test("Fig 13: R1 and R2 pushdowns improve latency") {
    val rows = Experiments.transformationRules(spark)
    assert(rows.size == 4)
    val r1 = rows.filter(_.name.startsWith("R1"))
    val r2 = rows.filter(_.name.startsWith("R2"))
    // R1 eliminates the fact-dim join — must win clearly on at least the
    // many-trends query (paper: 18% / 32%).
    assert(r1.exists(_.gainPct > 10), r1.map(r => s"${r.name}: ${r.gainPct}%").mkString(", "))
    r1.foreach(r => assert(r.gainPct > -20, s"${r.name} regressed badly: ${r.gainPct}%"))
    // R2 shrinks the input (paper: 14% / 19%); must not regress materially.
    r2.foreach(r => assert(r.gainPct > -20, s"${r.name} regressed badly: ${r.gainPct}%"))
    assert(r2.exists(_.gainPct > 0), r2.map(r => s"${r.name}: ${r.gainPct}%").mkString(", "))
  }
}
