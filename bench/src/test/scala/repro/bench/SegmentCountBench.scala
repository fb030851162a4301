package repro.bench

import repro.SparkSpec

/** Figures 11 and 12: the segment-aggregate count knob. More segments →
  * better pruning granularity up to a point; Sturges' choice sits near the
  * sweet spot.
  */
class SegmentCountBench extends SparkSpec {

  test("Fig 11/12: segmentation sweep — Sturges choice near the optimum") {
    val rows = Experiments.segmentSweep(spark)
    val byL = rows.map(r => r.segments -> r).toMap
    val sturges = rows.find(_.sturges).get

    // Finer segmentation prunes more tuple comparisons than a single summary.
    assert(sturges.tuplesCompared < byL(1).tuplesCompared,
      s"sturges ${sturges.tuplesCompared} vs 1-segment ${byL(1).tuplesCompared}")

    // The Sturges choice is within 2× of the best latency over the sweep
    // (the paper's "close to minimal possible latency", with timing noise
    // headroom at millisecond scale).
    val best = rows.map(_.seconds).min
    assert(sturges.seconds <= best * 2 + 0.05,
      s"sturges ${sturges.seconds}s vs best ${best}s")

    // Pruning is effective across the sweep: most pairs never fully compared.
    assert(sturges.pairsPruned > 0)
  }
}
