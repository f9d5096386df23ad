package repro.bench

import repro.experiments.SkewInfluence

/** Figure 9: runtime vs workload skew. Paper shape: the base-part
  * runtime stays nearly constant for both versions with V1 slightly
  * ahead (trie-probing overhead); from ~4 skewed runs the cached
  * aggregates pay off and V2 pulls ahead on the skew part.
  */
class Fig9SkewBench extends BenchSpec {

  private lazy val rows = SkewInfluence.run(fx)

  test("Fig 9 — runtime vs skew") {
    report(SkewInfluence.table(rows))
    assert(rows.map(_.skewRuns) == Seq(1, 2, 4, 8, 16))
  }

  test("shape: base-part runtime is nearly constant across skew levels") {
    def spread(xs: Seq[Double]): Double = xs.max / xs.min
    assert(spread(rows.map(_.v1BaseMs)) < 3.0)
    assert(spread(rows.map(_.v2BaseMs)) < 3.0)
  }

  test("shape: V2 wins the skew part at high skew") {
    val high = rows.find(_.skewRuns == 16).get
    assert(high.v2SkewMs < high.v1SkewMs * 1.05,
      s"V2 ${high.v2SkewMs} vs V1 ${high.v1SkewMs} at 16 skewed runs")
  }

  test("shape: V2's advantage on the skew part grows with skew") {
    val gains = rows.map(r => r.v1SkewMs / r.v2SkewMs.max(1e-4))
    assert(gains.max == gains.last || gains.last > gains.head,
      s"gain did not grow: ${gains.mkString(", ")}")
  }

  test("shape: V1 and V2 base-part runtimes stay within a small factor") {
    rows.foreach { r =>
      assert(r.v2BaseMs < r.v1BaseMs * 3,
        s"skew=${r.skewRuns}: V2 base ${r.v2BaseMs} vs V1 base ${r.v1BaseMs}")
    }
  }
}
