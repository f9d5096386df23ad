package repro.bench

import repro.experiments.LevelError

/** Figure 8: relative error and base-workload runtime vs block level.
  * Paper shape: error falls with the level while runtime grows (almost
  * exponentially past the level 17/18 "sweet spot"), errors become
  * negligible around levels 17–18.
  */
class Fig8LevelErrorBench extends BenchSpec {

  private lazy val rows = LevelError.run(fx)

  test("Fig 8 — relative error & runtime by level") {
    report(LevelError.table(rows))
    assert(rows.map(_.level) == (13 to 21))
  }

  test("shape: relative error decreases monotonically with the level") {
    val errs = rows.map(_.meanRelError)
    errs.sliding(2).foreach {
      case Seq(a, b) => assert(b <= a + 1e-9, s"error rose: $a -> $b")
      case _         => ()
    }
    assert(errs.last < errs.head / 10)
  }

  test("shape: error at the ~100m-cell sweet spot is small") {
    // Our planar grid's cells are ~2.7x coarser per level than real S2:
    // the paper's sweet spot (level 17/18, 100m/50m diagonals) maps to
    // our levels 18/19 (138m/69m). See EXPERIMENTS.md.
    val e18 = rows.find(_.level == 18).get.meanRelError
    val e19 = rows.find(_.level == 19).get.meanRelError
    assert(e18 < 0.25, s"e18=$e18")
    assert(e19 < 0.12, s"e19=$e19")
  }

  test("shape: runtime grows toward fine levels") {
    val r13 = rows.find(_.level == 13).get.runtimeMs
    val r21 = rows.find(_.level == 21).get.runtimeMs
    assert(r21 > r13 * 3, s"runtime 13=$r13 21=$r21")
  }

  test("shape: error halves per level while runtime roughly doubles") {
    val fine = rows.filter(_.level >= 17)
    fine.sliding(2).foreach {
      case Seq(a, b) =>
        val errRatio = a.meanRelError / b.meanRelError
        val rtRatio  = b.runtimeMs / a.runtimeMs
        assert(errRatio > 1.4 && errRatio < 3.5,
          s"level ${a.level}->${b.level}: error ratio $errRatio")
        assert(rtRatio > 1.3 && rtRatio < 4.0,
          s"level ${a.level}->${b.level}: runtime ratio $rtRatio")
      case _ => ()
    }
  }
}
