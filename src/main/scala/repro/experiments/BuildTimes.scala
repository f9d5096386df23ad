package repro.experiments

import repro.core.GeoBlock

/** Table 1 (index build times, sorting vs building, at levels 13–21) and
  * Figure 6c (level influence on build time and size overhead).
  *
  * Sorting is the Spark extract-and-reorganize phase, measured once — in
  * this reproduction the sort key is always the level-30 leaf key, so
  * unlike the paper's implementation (which piggybacks level-dependent
  * cell extraction onto the sort) sorting does not vary with the level;
  * see EXPERIMENTS.md.
  */
object BuildTimes {

  final case class Row(level: Int, sortMs: Double, buildMs: Double,
                       headerBytes: Long, numCells: Int, overheadPct: Double,
                       cellDiagMeters: Double)

  val Levels: Seq[Int] = 13 to 21

  def run(fx: Fixture): Seq[Row] =
    Levels.map { level =>
      val (block: GeoBlock, buildMs) = Harness.timeMs(fx.blockAt(level))
      val diag = repro.s2.CellId.fromPoint(-73.97, 40.75, level).diagonalMeters
      Row(level, fx.sortMs, buildMs, block.headerSizeBytes, block.numCells,
          100.0 * block.headerSizeBytes / fx.raw.sizeBytes, diag)
    }

  def table(rows: Seq[Row]): String =
    Harness.formatTable(
      "Table 1 / Fig 6c — GeoBlock build time and size by level",
      Seq("level", "cellDiag(m)", "sorting(ms)", "building(ms)", "cells", "header(KiB)", "overhead(%)"),
      rows.map(r => Seq(
        r.level.toString,
        f"${r.cellDiagMeters}%.1f",
        f"${r.sortMs}%.0f",
        f"${r.buildMs}%.1f",
        r.numCells.toString,
        f"${r.headerBytes / 1024.0}%.1f",
        f"${r.overheadPct}%.3f")))
}
