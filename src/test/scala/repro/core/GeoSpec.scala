package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class GeoSpec extends AnyFunSuite {

  test("Pt arithmetic") {
    assert(Pt(1, 2) + Pt(3, 4) == Pt(4, 6))
    assert(Pt(3, 4) - Pt(1, 1) == Pt(2, 3))
    assert(Pt(1, 2) * 2 == Pt(2, 4))
    assert(math.abs(Pt(0, 0).dist(Pt(3, 4)) - 5.0) < 1e-12)
    assert(math.abs(Pt(3, 4).norm - 5.0) < 1e-12)
  }

  test("degree/metre conversion is the paper's 111m-per-0.001") {
    assert(math.abs(Geo.toMeters(0.001) - 111.0) < 1e-9)
    assert(math.abs(Geo.toDegrees(Geo.toMeters(0.123)) - 0.123) < 1e-12)
  }

  test("ceilLog2 basics") {
    assert(MathUtil.ceilLog2(1) == 1)
    assert(MathUtil.ceilLog2(2) == 1)
    assert(MathUtil.ceilLog2(3) == 2)
    assert(MathUtil.ceilLog2(4) == 2)
    assert(MathUtil.ceilLog2(5) == 3)
    assert(MathUtil.ceilLog2(256) == 8)
    assert(MathUtil.ceilLog2(257) == 9)
  }

  test("Rect contains is half-open") {
    val r = Rect(0, 0, 1, 1)
    assert(r.contains(Pt(0, 0)))
    assert(!r.contains(Pt(1, 0)))
    assert(!r.contains(Pt(0, 1)))
    assert(r.contains(Pt(0.999, 0.999)))
  }

  test("Rect intersection") {
    assert(Rect(0, 0, 2, 2).intersection(Rect(1, 1, 3, 3)).contains(Rect(1, 1, 2, 2)))
    assert(Rect(0, 0, 1, 1).intersection(Rect(1, 0, 2, 1)).isEmpty)
    assert(Rect(0, 0, 1, 1).intersection(Rect(2, 2, 3, 3)).isEmpty)
  }

  test("bounding rect covers all points half-open") {
    val pts = Seq(Pt(0, 0), Pt(1, 2), Pt(-1, 3))
    val r = Rect.bounding(pts)
    assert(pts.forall(r.contains))
  }

  test("subtract with no overlap returns original") {
    val r = Rect(0, 0, 1, 1)
    assert(Rect.subtract(r, Rect(5, 5, 6, 6)) == Seq(r))
  }

  test("subtract fully covered returns empty") {
    assert(Rect.subtract(Rect(1, 1, 2, 2), Rect(0, 0, 3, 3)).isEmpty)
  }

  // Property: subtraction pieces are disjoint, inside r, outside b, and
  // conserve area — checked by area accounting and dense point sampling.
  for (seed <- 0 until 15)
    test(s"rect subtract partitions the complement (seed=$seed)") {
      val rng = new Random(seed)
      def rect(): Rect = {
        val x0 = rng.nextDouble() * 4; val y0 = rng.nextDouble() * 4
        Rect(x0, y0, x0 + rng.nextDouble() * 4 + 0.1, y0 + rng.nextDouble() * 4 + 0.1)
      }
      val r = rect(); val b = rect()
      val pieces = Rect.subtract(r, b)
      val interArea = r.intersection(b).map(_.area).getOrElse(0.0)
      assert(math.abs(pieces.map(_.area).sum - (r.area - interArea)) < 1e-9)
      for (Seq(p1, p2) <- pieces.combinations(2)) assert(!p1.intersects(p2))
      for (_ <- 0 until 500) {
        val p = Pt(rng.nextDouble() * 9 - 0.5, rng.nextDouble() * 9 - 0.5)
        val inPieces = pieces.exists(_.contains(p))
        assert(inPieces == (r.contains(p) && !b.contains(p)))
      }
    }

  for (seed <- 100 until 110)
    test(s"subtractAll leaves no overlap with any subtrahend (seed=$seed)") {
      val rng = new Random(seed)
      def rect(): Rect = {
        val x0 = rng.nextDouble() * 4; val y0 = rng.nextDouble() * 4
        Rect(x0, y0, x0 + rng.nextDouble() * 3 + 0.1, y0 + rng.nextDouble() * 3 + 0.1)
      }
      val r = rect()
      val bs = Seq.fill(4)(rect())
      val pieces = Rect.subtractAll(r, bs)
      for (p <- pieces; b <- bs) assert(!p.intersects(b))
      for (_ <- 0 until 300) {
        val p = Pt(rng.nextDouble() * 8, rng.nextDouble() * 8)
        assert(pieces.exists(_.contains(p)) == (r.contains(p) && !bs.exists(_.contains(p))))
      }
    }
}
