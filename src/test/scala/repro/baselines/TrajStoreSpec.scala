package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.TrajGen
import scala.util.Random

class TrajStoreSpec extends AnyFunSuite {

  test("starts with a single leaf covering the bbox") {
    val ts = new TrajStoreIndex(Rect(0, 0, 1, 1), maxPerLeaf = 10)
    assert(ts.leaves.length == 1)
    ts.insert(0, 1, Pt(0.5, 0.5))
    assert(ts.leaves.head.pts.length == 1)
  }

  test("overflow splits a leaf into four children") {
    val ts = new TrajStoreIndex(Rect(0, 0, 1, 1), maxPerLeaf = 4)
    val rng = new Random(1)
    for (i <- 0 until 20) ts.insert(i, 1, Pt(rng.nextDouble(), rng.nextDouble()))
    assert(ts.splitOps >= 1)
    assert(ts.leaves.length >= 4)
  }

  test("leaves partition the space (no point lost)") {
    val ts = new TrajStoreIndex(Rect(0, 0, 1, 1), maxPerLeaf = 8)
    val rng = new Random(2)
    val pts = Array.fill(200)(Pt(rng.nextDouble() * 0.999, rng.nextDouble() * 0.999))
    pts.zipWithIndex.foreach { case (p, i) => ts.insert(i, 1, p) }
    assert(ts.leaves.map(_.pts.length).sum == 200)
    for (p <- pts.take(50)) assert(ts.leafOf(p).rect.contains(p))
  }

  test("query returns ids co-located in the leaf at the same timestamp") {
    val ts = new TrajStoreIndex(Rect(0, 0, 1, 1), maxPerLeaf = 100)
    ts.insert(1, 5, Pt(0.1, 0.1))
    ts.insert(2, 5, Pt(0.12, 0.1))
    ts.insert(3, 6, Pt(0.1, 0.12)) // different timestamp
    ts.insert(4, 5, Pt(0.9, 0.9))  // same leaf until split
    val got = ts.query(Pt(0.1, 0.1), 5).toSet
    assert(got.contains(1) && got.contains(2) && !got.contains(3))
  }

  test("summarizeBounded respects the deviation bound") {
    val data = TrajGen.portoLike(30, 15, seed = 3)
    val ts = new TrajStoreIndex(data.bbox, maxPerLeaf = 100)
    for (t <- 1 to data.len; (id, p) <- data.pointsAt(t)) ts.insert(id, t, p)
    val eps = Geo.toDegrees(200.0)
    val (recon, words) = TrajStoreQuant.summarizeBounded(ts, eps)
    assert(words > 0)
    assert(recon.size == data.numPoints)
    for (((id, t), p) <- recon) assert(p.dist(data.point(id, t)) <= eps + 1e-12)
  }

  test("deeper splitting (smaller leaves) yields more, tighter cells") {
    val data = TrajGen.portoLike(60, 10, seed = 4)
    def leafCount(maxPerLeaf: Int): Int = {
      val ts = new TrajStoreIndex(data.bbox, maxPerLeaf)
      for (t <- 1 to data.len; (id, p) <- data.pointsAt(t)) ts.insert(id, t, p)
      ts.leaves.count(_.pts.nonEmpty)
    }
    assert(leafCount(50) > leafCount(5000))
  }

  test("summarizeBudgetAt covers exactly this timestamp's trajectories") {
    val data = TrajGen.portoLike(40, 10, seed = 5)
    val ts = new TrajStoreIndex(data.bbox, maxPerLeaf = 200)
    for (t <- 1 to 5; (id, p) <- data.pointsAt(t)) ts.insert(id, t, p)
    val rec = TrajStoreQuant.summarizeBudgetAt(ts, 3, v = 16, seed = 1)
    assert(rec.keySet == (0 until data.numTrajs).toSet)
  }

  test("summarizeBudgetAt error shrinks as the budget grows") {
    val data = TrajGen.portoLike(80, 5, seed = 6)
    val ts = new TrajStoreIndex(data.bbox, maxPerLeaf = 10000)
    for (t <- 1 to data.len; (id, p) <- data.pointsAt(t)) ts.insert(id, t, p)
    def mae(v: Int): Double = {
      val rec = TrajStoreQuant.summarizeBudgetAt(ts, 3, v, seed = 1)
      rec.map { case (id, p) => p.dist(data.point(id, 3)) }.sum / rec.size
    }
    assert(mae(128) < mae(2))
  }
}
