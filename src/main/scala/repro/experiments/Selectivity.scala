package repro.experiments

import repro.core.AdaptiveGeoBlock
import repro.workload.Workloads

/** Figure 7: per-query runtime at varying polygon selectivity, for all
  * engines. Selectivity polygons are rectangles around the data centroid
  * containing a target fraction of the rides; PHTree/RTree query the
  * interior rectangle (and thus see slightly lower selectivity), as in
  * the paper. V2 uses a 2% aggregate threshold with statistics from one
  * unskewed pass, matching the paper's setting.
  */
object Selectivity {

  final case class Row(targetSel: Double, achievedSel: Double,
                       v1Ms: Double, v2Ms: Double, bsMs: Double,
                       btMs: Double, phMs: Double, rtMs: Double)

  val Fracs: Seq[Double] = Seq(0.001, 0.005, 0.01, 0.05, 0.10, 0.25, 0.50)

  def run(fx: Fixture, threshold: Double = 0.02, reps: Int = 5): Seq[Row] = {
    val specs = Workloads.SevenAggs
    val selPolys = Fracs.map { f =>
      val (poly, achieved) = Workloads.selectivityRect(fx.raw.lons, fx.raw.lats, f)
      (f, PreparedQuery(poly, fx.DefaultLevel), achieved)
    }
    // V2 warm-up: one pass over the selectivity polygons, then cache.
    val v2 = new AdaptiveGeoBlock(fx.block)
    selPolys.foreach { case (_, q, _) => v2.selectCells(q.cells, specs) }
    v2.buildAggregateTrie(threshold)

    selPolys.map { case (f, poly, achieved) =>
      def one(engine: PreparedQuery => Double): Double =
        Harness.medianOf(reps)(fx.runWorkload(engine, Seq(poly)))
      Row(f, achieved,
        one(fx.v1Select(fx.block, specs)),
        one(fx.v2Select(v2, specs)),
        one(fx.bsSelect(specs)),
        one(fx.btSelect(specs)),
        one(fx.phSelect(specs)),
        one(fx.rtCount))
    }
  }

  def table(rows: Seq[Row]): String =
    Harness.formatTable(
      "Fig 7 — per-query runtime vs selectivity (level 17)",
      Seq("sel", "achieved", "BlocksV1(ms)", "BlocksV2(ms)", "BinarySearch(ms)",
          "BTree(ms)", "PHTree(ms)", "RTree(ms)"),
      rows.map(r => Seq(
        f"${r.targetSel * 100}%.1f%%",
        f"${r.achievedSel * 100}%.2f%%",
        f"${r.v1Ms}%.3f", f"${r.v2Ms}%.3f", f"${r.bsMs}%.3f",
        f"${r.btMs}%.3f", f"${r.phMs}%.3f", f"${r.rtMs}%.3f")))
}
