package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core._

class TrajGenSpec extends AnyFunSuite {

  test("porto-like: shape, alignment and bbox containment") {
    val d = TrajGen.portoLike(50, 40, seed = 1)
    assert(d.numTrajs == 50 && d.len == 40 && d.numPoints == 2000)
    for (traj <- d.trajs; p <- traj) assert(d.bbox.contains(p), s"$p outside ${d.bbox}")
  }

  test("porto-like: deterministic in seed") {
    val a = TrajGen.portoLike(20, 20, seed = 7)
    val b = TrajGen.portoLike(20, 20, seed = 7)
    assert(a.trajs.flatten == b.trajs.flatten)
    val c = TrajGen.portoLike(20, 20, seed = 8)
    assert(a.trajs.flatten != c.trajs.flatten)
  }

  test("porto-like: step lengths are urban-scale (tens to hundreds of metres)") {
    val d = TrajGen.portoLike(30, 60, seed = 2)
    val steps = for (traj <- d.trajs; i <- 1 until traj.length) yield Geo.toMeters(traj(i).dist(traj(i - 1)))
    val mean = steps.sum / steps.size
    assert(mean > 20 && mean < 600, s"mean step $mean m")
  }

  test("porto-like: motion is smooth (consecutive steps correlate)") {
    val d = TrajGen.portoLike(20, 80, seed = 3)
    // displacement over 2 ticks should usually exceed a single step (no jitter walk)
    var smooth = 0; var total = 0
    for (traj <- d.trajs; i <- 2 until traj.length) {
      val two = traj(i).dist(traj(i - 2))
      val one = traj(i - 1).dist(traj(i - 2))
      total += 1
      if (two > one) smooth += 1
    }
    assert(smooth.toDouble / total > 0.6, s"smooth fraction ${smooth.toDouble / total}")
  }

  test("geolife-like: spans a far larger region than porto-like") {
    val g = TrajGen.geolifeLike(60, 60, seed = 4)
    val p = TrajGen.portoLike(60, 60, seed = 4)
    val gSpread = Rect.bounding(g.trajs.flatten)
    val pSpread = Rect.bounding(p.trajs.flatten)
    assert(gSpread.width * gSpread.height > 5 * pSpread.width * pSpread.height)
  }

  test("geolife-like: mixes slow and fast movers") {
    val g = TrajGen.geolifeLike(80, 40, seed = 5)
    val meanSteps = g.trajs.map { traj =>
      (1 until traj.length).map(i => Geo.toMeters(traj(i).dist(traj(i - 1)))).sum / (traj.length - 1)
    }
    assert(meanSteps.min < 150, s"no walkers: min ${meanSteps.min}")
    assert(meanSteps.max > 800, s"no long-range: max ${meanSteps.max}")
  }

  test("pointsAt returns all trajectories at that timestamp") {
    val d = TrajGen.portoLike(25, 10, seed = 6)
    val pts = d.pointsAt(3)
    assert(pts.length == 25)
    assert(pts.map(_._1).toSeq == (0 until 25))
    assert(pts(7)._2 == d.point(7, 3))
  }

  test("allPoints streams numTrajs*len points in time order") {
    val d = TrajGen.portoLike(10, 5, seed = 7)
    val all = d.allPoints.toSeq
    assert(all.size == 50)
    assert(all.map(_._2).toSeq == all.map(_._2).sorted)
  }

  test("sub-Porto: copies are near their base trajectory") {
    val (targets, refs) = TrajGen.subPorto(base = 5, copies = 3, len = 40, seed = 8)
    assert(targets.length == 5 && refs.length == 15)
    // first copy of first target should track it within ~a few hundred metres
    val base = targets(0); val copy = refs(0)
    val meanDev = base.indices.map(i => Geo.toMeters(base(i).dist(copy(i)))).sum / base.length
    assert(meanDev < 500, s"mean deviation $meanDev m")
  }
}
