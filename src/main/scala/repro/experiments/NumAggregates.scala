package repro.experiments

import repro.core.AdaptiveGeoBlock
import repro.workload.Workloads

/** Figure 1: total runtime of the combined workload (base + 4 skewed
  * runs) for 1, 2, 4 and 8 requested aggregates, per engine. The PHTree
  * is omitted, as in the paper (it cannot represent the biased workload
  * and was ~3x slower than the other baselines on the base part).
  */
object NumAggregates {

  final case class Row(numAggs: Int, v1Ms: Double, v2Ms: Double,
                       bsMs: Double, btMs: Double)

  val AggCounts: Seq[Int] = Seq(1, 2, 4, 8)

  /** Threshold rescaled from the paper's 5% for the same coverage at
    * SF=0.1 (see [[SkewInfluence.run]]).
    */
  def run(fx: Fixture, skewRuns: Int = 4, threshold: Double = 0.25,
          reps: Int = 3): Seq[Row] = {
    val order   = Workloads.combined(fx.polys.length, skewRuns)
    val queries = order.map(fx.preparedBase)

    AggCounts.map { k =>
      val specs = Workloads.aggSubset(k)
      // V2: collect stats over the same workload, then cache aggregates.
      val v2 = new AdaptiveGeoBlock(fx.block)
      queries.foreach(q => v2.selectCells(q.cells, specs))
      v2.buildAggregateTrie(threshold)

      val v1Ms = Harness.medianOf(reps)(fx.runWorkload(fx.v1Select(fx.block, specs), queries))
      val v2Ms = Harness.medianOf(reps)(fx.runWorkload(fx.v2Select(v2, specs), queries))
      val bsMs = Harness.medianOf(reps)(fx.runWorkload(fx.bsSelect(specs), queries))
      val btMs = Harness.medianOf(reps)(fx.runWorkload(fx.btSelect(specs), queries))
      Row(k, v1Ms, v2Ms, bsMs, btMs)
    }
  }

  def table(rows: Seq[Row]): String =
    Harness.formatTable(
      "Fig 1 — combined-workload runtime vs number of aggregates",
      Seq("aggs", "BlocksV1(ms)", "BlocksV2(ms)", "BinarySearch(ms)", "BTree(ms)"),
      rows.map(r => Seq(
        r.numAggs.toString,
        f"${r.v1Ms}%.1f", f"${r.v2Ms}%.1f", f"${r.bsMs}%.1f", f"${r.btMs}%.1f")))
}
