package repro.s2

import repro.SparkSpec
import scala.util.Random

class HilbertSpec extends SparkSpec {

  test("xy2d/d2xy roundtrip at small orders exhaustively") {
    for (n <- 1 to 5; x <- 0L until (1L << n); y <- 0L until (1L << n)) {
      val d        = Hilbert.xy2d(n, x, y)
      val (rx, ry) = Hilbert.d2xy(n, d)
      assert((rx, ry) == (x, y), s"n=$n x=$x y=$y d=$d")
    }
  }

  test("order-1 curve visits the canonical quadrant order") {
    val order = (0L until 4L).map(Hilbert.d2xy(1, _))
    assert(order == Seq((0L, 0L), (0L, 1L), (1L, 1L), (1L, 0L)))
  }

  test("positions are a bijection at order 3") {
    val n    = 3
    val seen = (for (x <- 0L until 8L; y <- 0L until 8L) yield Hilbert.xy2d(n, x, y)).toSet
    assert(seen == (0L until 64L).toSet)
  }

  test("consecutive positions are grid neighbours (curve continuity)") {
    val n = 6
    var prev = Hilbert.d2xy(n, 0)
    for (d <- 1L until (1L << (2 * n))) {
      val cur  = Hilbert.d2xy(n, d)
      val dist = math.abs(cur._1 - prev._1) + math.abs(cur._2 - prev._2)
      assert(dist == 1, s"jump at d=$d: $prev -> $cur")
      prev = cur
    }
  }

  test("roundtrip at order 30 on random coordinates") {
    val rnd = new Random(1)
    for (_ <- 1 to 2000) {
      val x = rnd.nextLong() & ((1L << 30) - 1)
      val y = rnd.nextLong() & ((1L << 30) - 1)
      val d = Hilbert.xy2d(30, x, y)
      assert(d >= 0 && d < (1L << 60))
      assert(Hilbert.d2xy(30, d) == (x, y))
    }
  }

  test("prefix property: truncating the position selects the ancestor cell") {
    val rnd = new Random(2)
    for (_ <- 1 to 500) {
      val x = rnd.nextLong() & ((1L << 30) - 1)
      val y = rnd.nextLong() & ((1L << 30) - 1)
      val d30 = Hilbert.xy2d(30, x, y)
      for (l <- Seq(1, 5, 13, 17, 21, 29)) {
        val expected = Hilbert.xy2d(l, x >>> (30 - l), y >>> (30 - l))
        assert(d30 >>> (2 * (30 - l)) == expected, s"level $l")
      }
    }
  }

  test("spatial locality: nearby points share long position prefixes on average") {
    val rnd = new Random(3)
    val pairs = (1 to 200).map { _ =>
      val x = rnd.nextLong() & ((1L << 30) - 2)
      val y = rnd.nextLong() & ((1L << 30) - 2)
      val dNear = math.abs(Hilbert.xy2d(30, x, y) - Hilbert.xy2d(30, x + 1, y))
      val far   = (x + (1L << 29)) & ((1L << 30) - 1)
      val dFar  = math.abs(Hilbert.xy2d(30, x, y) - Hilbert.xy2d(30, far, y))
      (dNear.toDouble, dFar.toDouble)
    }
    val avgNear = pairs.map(_._1).sum / pairs.length
    val avgFar  = pairs.map(_._2).sum / pairs.length
    assert(avgNear < avgFar / 1000, s"near=$avgNear far=$avgFar")
  }
}
