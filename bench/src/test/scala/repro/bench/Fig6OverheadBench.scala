package repro.bench

import repro.experiments.EngineOverhead

/** Figures 6a/6b: per-engine build time and size overhead at level 17.
  * Paper shape: sorting dominates the Block build; the Block is built
  * faster than BTree and PHTree (only BinarySearch is quicker, it just
  * sorts); the Block header overhead is comparable to — often lower
  * than — the point indexes.
  */
class Fig6OverheadBench extends BenchSpec {

  private lazy val rows = EngineOverhead.run(fx)

  private def row(name: String) = rows.find(_.engine == name).get

  test("Fig 6a/6b — engine build time and size overhead") {
    report(EngineOverhead.table(rows))
    assert(rows.length == 5)
  }

  test("shape: block building is cheap next to the shared sorting phase") {
    val b = row("Block(17)")
    assert(b.buildMs < b.sortMs,
      s"block building ${b.buildMs} not below sorting ${b.sortMs}")
  }

  test("shape: binary search needs no storage; block header is small") {
    assert(row("BinarySearch").sizeBytes == 0)
    val blockPct = row("Block(17)").overheadPct
    assert(blockPct < 50.0, s"block overhead $blockPct% too large")
  }

  test("shape: block header overhead is below the point-index overheads") {
    val blockPct = row("Block(17)").overheadPct
    assert(blockPct < row("BTree").overheadPct)
    assert(blockPct < row("PHTree").overheadPct)
    assert(blockPct < row("RTree").overheadPct)
  }

  test("shape: block build time is competitive with the index builds") {
    val b = row("Block(17)")
    // paper: Block built faster than BTree and PHTree
    assert(b.buildMs < row("PHTree").buildMs * 2,
      s"block ${b.buildMs} vs PHTree ${row("PHTree").buildMs}")
  }
}
