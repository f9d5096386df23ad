package repro.workload

import repro.SynthData
import repro.geo.{BBox, Polygon, Pt}
import scala.util.Random

/** Synthetic NYC "neighborhoods" (substitute for the NTA polygon
  * shapefile — see DESIGN.md): a jittered grid tiling of the NYC bbox.
  * Grid nodes are displaced deterministically, and each cell becomes the
  * quadrilateral of its four (shared) displaced corners — so the 192
  * polygons are simple, non-rectangular, and exactly partition the city,
  * which the relative-error experiment relies on.
  */
object Neighborhoods {

  val Bounds: BBox = BBox(SynthData.NycMinLon, SynthData.NycMinLat,
                          SynthData.NycMaxLon, SynthData.NycMaxLat)

  /** nx * ny quadrilaterals; jitter is a fraction of the cell size. */
  def generate(nx: Int = 16, ny: Int = 12, jitter: Double = 0.3,
               seed: Long = 7): IndexedSeq[Polygon] = {
    val rnd = new Random(seed)
    val dx  = Bounds.width / nx
    val dy  = Bounds.height / ny
    // Displace interior grid nodes only, so the outer boundary stays put.
    val nodes = Array.tabulate(nx + 1, ny + 1) { (i, j) =>
      val jx = if (i == 0 || i == nx) 0.0 else (rnd.nextDouble() - 0.5) * 2 * jitter * dx
      val jy = if (j == 0 || j == ny) 0.0 else (rnd.nextDouble() - 0.5) * 2 * jitter * dy
      Pt(Bounds.minX + i * dx + jx, Bounds.minY + j * dy + jy)
    }
    (for {
      i <- 0 until nx
      j <- 0 until ny
    } yield Polygon(IndexedSeq(
      nodes(i)(j), nodes(i + 1)(j), nodes(i + 1)(j + 1), nodes(i)(j + 1)
    ))).toIndexedSeq
  }
}
