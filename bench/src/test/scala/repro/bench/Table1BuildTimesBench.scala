package repro.bench

import repro.experiments.BuildTimes

/** Table 1: index build times (sorting vs building) at block levels
  * 13–21, plus Figure 6c's size column.
  */
class Table1BuildTimesBench extends BenchSpec {

  private lazy val rows = BuildTimes.run(fx)

  test("Table 1 — build time split by level") {
    report(BuildTimes.table(rows))
    assert(rows.map(_.level) == (13 to 21))
  }

  test("shape: sorting dominates building at every level (paper: ~6-7s vs ~0.4-1s)") {
    rows.foreach { r =>
      assert(r.sortMs > r.buildMs,
        s"level ${r.level}: sorting ${r.sortMs} <= building ${r.buildMs}")
    }
  }

  test("shape: building grows toward the finest levels (paper: 376ms@13 -> 1025ms@21)") {
    val b13 = rows.find(_.level == 13).get.buildMs
    val b21 = rows.find(_.level == 21).get.buildMs
    assert(b21 > b13, s"building at 21 ($b21) not above 13 ($b13)")
  }

  test("shape: header size grows superlinearly with the level (Fig 6c)") {
    val sizes = rows.map(_.headerBytes)
    assert(sizes == sizes.sorted, "header size not monotone in level")
    assert(sizes.last > sizes.head * 20, s"size growth too flat: ${sizes.head} -> ${sizes.last}")
  }

  test("shape: cell counts grow with the level") {
    val cells = rows.map(_.numCells)
    assert(cells == cells.sorted)
  }
}
