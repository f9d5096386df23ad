package repro.bench

import repro.experiments.ThresholdInfluence

/** Figure 10: aggregate-threshold influence. Paper shape: up to ~5% only
  * skew-workload cells are cached (skew part speeds up first); larger
  * thresholds start caching base-workload cells too, until at ~50% the
  * whole workload is cached and further memory brings no speedup.
  */
class Fig10ThresholdBench extends BenchSpec {

  private lazy val res = ThresholdInfluence.run(fx)

  test("Fig 10 — threshold influence") {
    report(ThresholdInfluence.table(res))
    assert(res.rows.length == ThresholdInfluence.Thresholds.length)
  }

  test("shape: cached-cell count grows with the threshold until every workload cell is cached") {
    val counts = res.rows.map(_.aggregatedCells)
    assert(counts == counts.sorted, s"not monotone: $counts")
    // saturation: at the largest threshold the whole workload is cached
    assert(res.rows.last.aggregatedCells == res.totalCandidates,
      s"${res.rows.last.aggregatedCells} cached of ${res.totalCandidates} workload cells")
  }

  test("shape: the skew part speeds up once the skewed cells fit (~25% here, 5% in the paper)") {
    // Coverage point rescaled: our header is ~10x smaller than the
    // paper's while the workload covering is unchanged (EXPERIMENTS.md).
    val fit    = res.rows.filter(_.thresholdPct >= 25.0)
    val before = res.rows.head
    assert(fit.map(_.v2SkewMs).min < before.v2SkewMs,
      s"skew part never sped up: before ${before.v2SkewMs}, after fit ${fit.map(_.v2SkewMs).min}")
    assert(fit.map(_.v2SkewMs).min < res.v1SkewMs * 1.05,
      s"V2@fit ${fit.map(_.v2SkewMs).min} vs V1 ${res.v1SkewMs}")
  }

  test("shape: large thresholds speed up the base workload as well") {
    val large = res.rows.last
    val small = res.rows.head
    assert(large.v2BaseMs < small.v2BaseMs * 1.05,
      s"base not sped up: ${small.v2BaseMs} -> ${large.v2BaseMs}")
    assert(large.v2BaseMs < res.v1BaseMs * 1.25,
      s"V2@max ${large.v2BaseMs} vs V1 ${res.v1BaseMs}")
  }

  test("shape: no further speedup once everything is cached") {
    val last = res.rows.takeRight(2)
    val a = last(0); val b = last(1)
    assert(b.v2SkewMs < a.v2SkewMs * 1.5 && b.v2BaseMs < a.v2BaseMs * 1.5)
  }
}
