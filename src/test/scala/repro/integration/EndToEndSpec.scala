package repro.integration

import repro.{Oracle, SparkSpec, SynthData, TestData}
import repro.core._
import repro.baselines.{BTreeIndex, BinarySearchIndex}
import repro.s2.{CellId, Covering}
import repro.workload.Workloads

/** End-to-end: Spark build -> driver structures -> polygon queries, with
  * every engine agreeing and the error bound holding, plus a full
  * pipeline oracle check against DuckDB.
  */
class EndToEndSpec extends SparkSpec {

  private lazy val raw   = TestData.raw
  private lazy val block = TestData.block17

  test("all engines agree on SELECT results across the base workload") {
    val bs    = new BinarySearchIndex(raw)
    val bt    = new BTreeIndex(raw)
    val v2    = new AdaptiveGeoBlock(block)
    val specs = Workloads.SevenAggs
    val cols  = AggSpec.neededCols(specs)
    TestData.polys.indices.foreach(i => v2.select(TestData.polys(i), specs))
    v2.buildAggregateTrie(0.05)
    TestData.polys.grouped(10).map(_.head).foreach { poly =>
      val cells = Covering.exterior(poly, 17)
      val a = block.select(poly, specs)
      val b = v2.select(poly, specs)
      val c = bs.aggregateCells(cells, cols).extractAll(specs)
      val d = bt.aggregateCells(cells, cols).extractAll(specs)
      Seq(b, c, d).foreach { other =>
        a.zip(other).foreach { case (x, y) =>
          if (x.isNaN) assert(y.isNaN)
          else assert(math.abs(x - y) < 1e-6 * math.abs(x).max(1.0))
        }
      }
    }
  }

  test("error bound: covering error is within the covering area blow-up") {
    // For every neighborhood: exact <= measured, and the extra tuples all
    // lie within cells intersecting the polygon boundary.
    TestData.polys.grouped(16).map(_.head).foreach { poly =>
      val exact    = TestData.exactPolygonCount(raw, poly)
      val measured = block.count(poly)
      assert(measured >= exact)
      val boundaryCells = Covering.exterior(poly, 17)
        .filterNot(c => poly.relateBox(c.bounds) == repro.geo.BoxRelation.ContainsBox)
      val boundaryTuples = boundaryCells.map(block.countCell).sum
      assert(measured - exact <= boundaryTuples)
    }
  }

  test("full pipeline matches DuckDB: polygon covering aggregate at SF=0.002") {
    val points = SynthData.taxiTrips(spark, 0.002, seed = 77)
    val keyed  = GeoBlockSpark.withLeafKey(points)
    val poly   = TestData.polys(45)
    val cells  = Covering.exterior(poly, 15)
    val cov    = GeoBlockSpark.coveringDF(spark, cells)
    val header = GeoBlockSpark.headerDF(keyed, 15, Seq("passenger_count"))
    val got = GeoBlockSpark.queryHeaderDF(header, cov, Seq("passenger_count"))
      .select("cnt", "sum_passenger_count")
    val sql =
      """SELECT count(*) AS cnt,
        |       sum(CAST(t.passenger_count AS DOUBLE)) AS sum_passenger_count
        |FROM taxi t, cov c
        |WHERE CAST(t.cell_key AS BIGINT) BETWEEN CAST(c.lo AS BIGINT)
        |                                     AND CAST(c.hi AS BIGINT)""".stripMargin
    Oracle.assertEquivalent(got, sql, "taxi" -> keyed, "cov" -> cov)
  }

  test("COUNT fast path equals distributed count for sampled neighborhoods") {
    val keyed = GeoBlockSpark.withLeafKey(SynthData.taxiTrips(spark, 0.01)).cache()
    for (i <- Seq(20, 85, 150)) {
      val cells = Covering.exterior(TestData.polys(i), 17)
      val cov   = GeoBlockSpark.coveringDF(spark, cells)
      val dist  = GeoBlockSpark.queryPointsDF(keyed, cov, Nil).collect()(0).getAs[Long]("cnt")
      assert(block.count(TestData.polys(i)) == dist, s"poly $i")
    }
  }

  test("rebuilding a block at a different level from the same raw data is consistent") {
    val b14 = TestData.block14
    // total tuples conserved across levels
    assert(b14.totalTuples == block.totalTuples)
    // coarse counts are the sums of fine counts
    val cell14 = CellId(b14.keys(b14.numCells / 2))
    val fineSum = block.keys.indices
      .filter(i => cell14.contains(CellId(block.keys(i))))
      .map(block.counts(_)).sum
    assert(b14.countCell(cell14) == fineSum)
  }

  test("skewed workload makes the AggregateTrie cache the hot cells") {
    val v2    = new AdaptiveGeoBlock(block)
    val specs = Workloads.SevenAggs
    val hot   = Workloads.skewedIndices(TestData.polys.length)
    // base once + hot 8x
    TestData.polys.foreach(p => v2.select(p, specs))
    (1 to 8).foreach(_ => hot.foreach(i => v2.select(TestData.polys(i), specs)))
    val trie = v2.buildAggregateTrie(0.05)
    assert(trie.numAggregates > 0)
    // the cached cells should overwhelmingly come from hot polygons' coverings
    val hotCells = hot.flatMap(i => Covering.exterior(TestData.polys(i), 17)).map(_.id).toSet
    val cached   = trie.aggregatedCells.map(_.id)
    val inHot    = cached.count(hotCells.contains)
    assert(inHot >= cached.length * 0.8, s"only $inHot/${cached.length} cached cells are hot")
  }
}
