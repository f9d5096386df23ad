package repro.experiments

import repro.core.AdaptiveGeoBlock

import repro.workload.Workloads

/** Figure 10: influence of the aggregate threshold (AggregateTrie size as
  * a fraction of the GeoBlock header) on the base- and skew-part runtime
  * of V2, with V1 as the unaffected reference. Level 17, 4 skewed runs.
  */
object ThresholdInfluence {

  final case class Row(thresholdPct: Double, v2BaseMs: Double, v2SkewMs: Double,
                       aggregatedCells: Int)

  val Thresholds: Seq[Double] = Seq(0.005, 0.01, 0.02, 0.05, 0.10, 0.25, 0.50, 1.00, 2.00)

  final case class Result(v1BaseMs: Double, v1SkewMs: Double, rows: Seq[Row],
                          totalCandidates: Int)

  def run(fx: Fixture, skewRuns: Int = 4, reps: Int = 3): Result = {
    val specs = Workloads.SevenAggs
    val base: Seq[PreparedQuery] = fx.preparedBase
    val skewPart: Seq[PreparedQuery] =
      Seq.fill(skewRuns)(Workloads.skewedIndices(fx.polys.length).map(fx.preparedBase)).flatten

    val v1BaseMs = Harness.medianOf(reps)(fx.runWorkload(fx.v1Select(fx.block, specs), base))
    val v1SkewMs = Harness.medianOf(reps)(fx.runWorkload(fx.v1Select(fx.block, specs), skewPart))

    var candidates = 0
    val rows = Thresholds.map { th =>
      val v2 = new AdaptiveGeoBlock(fx.block)
      (base ++ skewPart).foreach(q => v2.selectCells(q.cells, specs))
      candidates = v2.stats.candidates.count(_.cell.level <= fx.block.blockLevel)
      val trie = v2.buildAggregateTrie(th)
      val v2BaseMs = Harness.medianOf(reps)(fx.runWorkload(fx.v2Select(v2, specs), base))
      val v2SkewMs = Harness.medianOf(reps)(fx.runWorkload(fx.v2Select(v2, specs), skewPart))
      Row(th * 100, v2BaseMs, v2SkewMs, trie.numAggregates)
    }
    Result(v1BaseMs, v1SkewMs, rows, candidates)
  }

  def table(res: Result): String = {
    val ref = Seq(Seq("V1 (ref)",
      f"${res.v1BaseMs}%.1f", f"${res.v1SkewMs}%.1f", "-"))
    Harness.formatTable(
      s"Fig 10 — aggregate-threshold influence (level 17, 4 skewed runs, " +
        s"${res.totalCandidates} workload cells)",
      Seq("threshold", "base(ms)", "skew(ms)", "cachedCells"),
      ref ++ res.rows.map(r => Seq(
        f"${r.thresholdPct}%.1f%%",
        f"${r.v2BaseMs}%.1f", f"${r.v2SkewMs}%.1f",
        r.aggregatedCells.toString)))
  }
}
