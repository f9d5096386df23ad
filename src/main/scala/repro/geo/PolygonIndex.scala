package repro.geo

/** Grid-bucketed point-to-polygon locator, used to compute exact
  * ground-truth counts per polygon (the denominator of the paper's
  * relative-error metric) in a single Spark pass: the index is broadcast
  * and probed from a UDF.
  */
final class PolygonIndex(val polygons: IndexedSeq[Polygon],
                         gridX: Int = 64, gridY: Int = 64) extends Serializable {

  private val world: BBox = BBox(
    polygons.map(_.bbox.minX).min, polygons.map(_.bbox.minY).min,
    polygons.map(_.bbox.maxX).max, polygons.map(_.bbox.maxY).max)

  private val dx = world.width / gridX
  private val dy = world.height / gridY

  private def clamp(v: Int, max: Int): Int = math.min(max - 1, math.max(0, v))
  private def gx(x: Double): Int = clamp(((x - world.minX) / dx).toInt, gridX)
  private def gy(y: Double): Int = clamp(((y - world.minY) / dy).toInt, gridY)

  /** buckets(cellX)(cellY) = indices of polygons whose bbox overlaps it. */
  private val buckets: Array[Array[Array[Int]]] = {
    val tmp = Array.fill(gridX, gridY)(new scala.collection.mutable.ArrayBuffer[Int])
    polygons.zipWithIndex.foreach { case (p, idx) =>
      for {
        i <- gx(p.bbox.minX) to gx(p.bbox.maxX)
        j <- gy(p.bbox.minY) to gy(p.bbox.maxY)
      } tmp(i)(j) += idx
    }
    tmp.map(_.map(_.toArray))
  }

  /** Index of the first polygon containing the point, or -1. */
  def locate(x: Double, y: Double): Int = {
    if (!world.contains(Pt(x, y))) return -1
    val cands = buckets(gx(x))(gy(y))
    var i = 0
    while (i < cands.length) {
      if (polygons(cands(i)).contains(Pt(x, y))) return cands(i)
      i += 1
    }
    -1
  }
}
