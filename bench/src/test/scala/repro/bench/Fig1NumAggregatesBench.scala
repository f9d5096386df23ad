package repro.bench

import repro.experiments.NumAggregates

/** Figure 1: total combined-workload runtime vs number of aggregates.
  * Paper shape: Blocks beat BTree/BinarySearch by ~2 orders of magnitude
  * for every aggregate count, and the aggregate count is not a highly
  * influential factor for any engine.
  */
class Fig1NumAggregatesBench extends BenchSpec {

  private lazy val rows = NumAggregates.run(fx)

  test("Fig 1 — runtime vs number of aggregates") {
    report(NumAggregates.table(rows))
    assert(rows.map(_.numAggs) == Seq(1, 2, 4, 8))
  }

  test("shape: blocks outperform both on-the-fly baselines for all aggregate counts") {
    // The paper's gap is ~100x at 12M rows; at SF=0.1 the tuples-per-cell
    // ratio (and hence the gap) compresses — see EXPERIMENTS.md.
    rows.foreach { r =>
      assert(r.v1Ms * 1.5 < r.bsMs, s"aggs=${r.numAggs}: V1 ${r.v1Ms} vs BS ${r.bsMs}")
      assert(r.v1Ms * 1.5 < r.btMs, s"aggs=${r.numAggs}: V1 ${r.v1Ms} vs BT ${r.btMs}")
    }
    // the gap widens with more aggregates (baselines touch raw tuples)
    val last = rows.last
    assert(last.v1Ms * 3 < last.bsMs, s"V1 ${last.v1Ms} vs BS ${last.bsMs} at 8 aggs")
  }

  test("shape: number of aggregates is not a highly influential factor") {
    // runtime from 1 to 8 aggregates grows by well under an order of magnitude
    def growth(f: NumAggregates.Row => Double): Double = f(rows.last) / f(rows.head)
    assert(growth(_.v1Ms) < 6.0)
    assert(growth(_.bsMs) < 6.0)
    assert(growth(_.btMs) < 6.0)
  }

  test("shape: V2 stays competitive and beats the on-the-fly baselines") {
    rows.drop(1).foreach { r => // at 1 aggregate (COUNT) baselines do minimal work
      assert(r.v2Ms < r.bsMs, s"aggs=${r.numAggs}: V2 ${r.v2Ms} vs BS ${r.bsMs}")
      assert(r.v2Ms < r.v1Ms * 3, s"aggs=${r.numAggs}: V2 ${r.v2Ms} vs V1 ${r.v1Ms}")
    }
  }
}
