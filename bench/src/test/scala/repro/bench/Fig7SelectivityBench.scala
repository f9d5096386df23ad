package repro.bench

import repro.experiments.Selectivity

/** Figure 7: per-query runtime at varying selectivity. Paper shape:
  * GeoBlocks beat the on-the-fly baselines by 2–4 orders of magnitude,
  * their runtime rises only softly with selectivity, the RTree (aR-tree
  * emulation) beats the on-the-fly baselines but trails the Blocks and
  * narrows at high selectivity, and the PHTree drops behind.
  */
class Fig7SelectivityBench extends BenchSpec {

  private lazy val rows = Selectivity.run(fx)

  test("Fig 7 — query runtime vs selectivity") {
    report(Selectivity.table(rows))
    assert(rows.nonEmpty)
  }

  test("shape: blocks beat on-the-fly baselines at every selectivity") {
    rows.foreach { r =>
      assert(r.v1Ms < r.bsMs, s"sel=${r.targetSel}: V1 ${r.v1Ms} vs BS ${r.bsMs}")
      assert(r.v1Ms < r.btMs, s"sel=${r.targetSel}: V1 ${r.v1Ms} vs BT ${r.btMs}")
    }
    rows.filter(_.targetSel >= 0.05).foreach { r =>
      assert(r.v1Ms * 5 < r.bsMs, s"sel=${r.targetSel}: V1 ${r.v1Ms} vs BS ${r.bsMs}")
    }
  }

  test("shape: the gap is orders of magnitude at high selectivity") {
    val high = rows.last
    assert(high.v1Ms * 20 < high.bsMs,
      s"V1 ${high.v1Ms} vs BS ${high.bsMs} at sel=${high.targetSel}")
  }

  test("shape: baseline runtime rises much faster with selectivity than blocks") {
    val lo = rows.head
    val hi = rows.last
    val bsGrowth = hi.bsMs / lo.bsMs.max(1e-4)
    val v1Growth = hi.v1Ms / lo.v1Ms.max(1e-4)
    assert(bsGrowth > v1Growth, s"bsGrowth=$bsGrowth v1Growth=$v1Growth")
  }

  test("shape: RTree (aR-tree) beats the on-the-fly baselines") {
    rows.drop(2).foreach { r => // at the tiniest selectivities all engines are ~free
      assert(r.rtMs < r.bsMs, s"sel=${r.targetSel}: RT ${r.rtMs} vs BS ${r.bsMs}")
    }
  }

  test("shape: PHTree falls behind at high selectivity") {
    val high = rows.last
    assert(high.phMs > high.v1Ms, s"PH ${high.phMs} vs V1 ${high.v1Ms}")
  }
}
