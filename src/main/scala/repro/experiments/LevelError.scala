package repro.experiments

import repro.s2.CellId
import repro.workload.Workloads

/** Figure 8: relative error and query runtime of the base workload at
  * block levels 13–21. The relative error of a polygon query is
  * |covering count - exact count| / exact count, with the exact count
  * from the point-in-polygon ground truth. Like the paper's NTA
  * neighborhoods (all of which see substantial taxi traffic), the error
  * mean is taken over polygons with a meaningful number of points —
  * near-empty water/fringe tiles of the synthetic tiling would otherwise
  * let a handful of boundary tuples produce unbounded relative errors.
  */
object LevelError {

  final case class Row(level: Int, cellDiagMeters: Double,
                       runtimeMs: Double, meanRelError: Double)

  val Levels: Seq[Int] = 13 to 21

  def run(fx: Fixture, reps: Int = 3): Seq[Row] = {
    val specs = Workloads.SevenAggs
    val exact = fx.exactCounts
    Levels.map { level =>
      val block    = fx.blockAt(level)
      val prepared = fx.prepare(fx.polys, level)
      val runtime =
        Harness.medianOf(reps)(fx.runWorkload(fx.v1Select(block, specs), prepared))
      val minCount = math.max(1L, (fx.raw.size * 0.0005).toLong)
      val errs = fx.polys.indices.flatMap { i =>
        if (exact(i) < minCount) None
        else {
          val measured = prepared(i).cells.map(block.countCell).sum
          Some(math.abs(measured - exact(i)).toDouble / exact(i))
        }
      }
      val diag = CellId.fromPoint(-73.97, 40.75, level).diagonalMeters
      Row(level, diag, runtime, errs.sum / errs.length)
    }
  }

  def table(rows: Seq[Row]): String =
    Harness.formatTable(
      "Fig 8 — relative error & base-workload runtime vs block level",
      Seq("level", "cellDiag(m)", "runtime(ms)", "meanRelError"),
      rows.map(r => Seq(
        r.level.toString,
        f"${r.cellDiagMeters}%.1f",
        f"${r.runtimeMs}%.1f",
        f"${r.meanRelError}%.4f")))
}
