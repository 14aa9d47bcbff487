package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.TrajGen
import scala.util.Random

class RestSpec extends AnyFunSuite {

  test("a trajectory compresses perfectly against itself as reference") {
    val rng = new Random(1)
    val traj = Array.fill(50)(Pt(rng.nextDouble(), rng.nextDouble()))
    val refSet = Rest.RefSet(IndexedSeq(traj), 1e-6)
    val c = Rest.compress(traj, refSet)
    assert(c.segments == 1 && c.rawPoints == 0)
    assert(c.bits == 96)
  }

  test("no references means every point is raw") {
    val traj = Array.fill(10)(Pt(1, 1))
    val refSet = Rest.RefSet(IndexedSeq(Array(Pt(50, 50))), 1e-3)
    val c = Rest.compress(traj, refSet)
    assert(c.segments == 0 && c.rawPoints == 10)
    assert(c.bits == 10L * 128)
  }

  test("a noisy copy within eps still matches") {
    val rng = new Random(2)
    val base = Array.tabulate(40)(i => Pt(i * 0.01, math.sin(i * 0.2) * 0.01))
    val noisy = base.map(p => Pt(p.x + rng.nextGaussian() * 1e-5, p.y + rng.nextGaussian() * 1e-5))
    val refSet = Rest.RefSet(IndexedSeq(base), 1e-3)
    val c = Rest.compress(noisy, refSet)
    assert(c.segments >= 1 && c.rawPoints == 0)
  }

  test("partial overlap produces segments plus raw points") {
    val base = Array.tabulate(20)(i => Pt(i * 0.01, 0.0))
    val traj = base.take(10) ++ Array.tabulate(10)(i => Pt(5.0 + i * 0.01, 5.0))
    val refSet = Rest.RefSet(IndexedSeq(base), 1e-6)
    val c = Rest.compress(traj, refSet)
    assert(c.segments >= 1 && c.rawPoints == 10)
  }

  test("compression ratio on sub-Porto beats raw storage") {
    val (targets, refs) = TrajGen.subPorto(base = 10, len = 60, seed = 9)
    val ratio = Rest.compressionRatio(targets, refs, Geo.toDegrees(200.0))
    assert(ratio > 1.0, s"ratio=$ratio")
  }

  test("larger deviation bound improves REST's ratio") {
    val (targets, refs) = TrajGen.subPorto(base = 10, len = 60, seed = 10)
    val tight = Rest.compressionRatio(targets, refs, Geo.toDegrees(50.0))
    val loose = Rest.compressionRatio(targets, refs, Geo.toDegrees(800.0))
    assert(loose >= tight, s"tight=$tight loose=$loose")
  }
}
