package repro.experiments

/** Figures 6a/6b: per-engine build time (split into the shared sorting
  * phase and the engine-specific build) and relative size overhead
  * against the raw columnar data. Block level fixed at 17, as in the
  * paper.
  */
object EngineOverhead {

  final case class Row(engine: String, sortMs: Double, buildMs: Double,
                       sizeBytes: Long, overheadPct: Double)

  def run(fx: Fixture): Seq[Row] = {
    val rawBytes = fx.raw.sizeBytes.toDouble
    def pct(b: Long) = 100.0 * b / rawBytes
    Seq(
      Row("Block(17)", fx.sortMs, fx.blockBuildMs,
          fx.block.headerSizeBytes, pct(fx.block.headerSizeBytes)),
      Row("BinarySearch", fx.sortMs, fx.binarySearchBuildMs,
          fx.binarySearch.sizeBytes, pct(fx.binarySearch.sizeBytes)),
      Row("BTree", fx.sortMs, fx.btreeBuildMs,
          fx.btree.sizeBytes, pct(fx.btree.sizeBytes)),
      Row("PHTree", 0.0, fx.phtreeBuildMs,
          fx.phtree.sizeBytes, pct(fx.phtree.sizeBytes)),
      Row("RTree", 0.0, fx.rtreeBuildMs,
          fx.rtree.sizeBytes, pct(fx.rtree.sizeBytes)),
    )
  }

  def table(rows: Seq[Row]): String =
    Harness.formatTable(
      "Fig 6a/6b — index build time and size overhead (level 17)",
      Seq("engine", "sorting(ms)", "building(ms)", "size(KiB)", "overhead(%)"),
      rows.map(r => Seq(
        r.engine,
        f"${r.sortMs}%.0f",
        f"${r.buildMs}%.1f",
        f"${r.sizeBytes / 1024.0}%.1f",
        f"${r.overheadPct}%.3f")))
}
