package repro.data

import repro.core._
import scala.util.Random

/** A time-aligned trajectory repository: `trajs(i)(t-1)` is trajectory i's
  * position at timestamp t (t = 1..len). The paper processes points per
  * timestamp ({T_i^t}); alignment mirrors that model. */
final case class TrajDataset(name: String, trajs: IndexedSeq[Array[Pt]], bbox: Rect) {
  require(trajs.nonEmpty && trajs.forall(_.length == trajs.head.length), "trajectories must be aligned")
  val numTrajs: Int = trajs.length
  val len: Int = trajs.head.length
  def numPoints: Long = numTrajs.toLong * len
  def point(id: Int, t: Int): Pt = trajs(id)(t - 1)
  def pointsAt(t: Int): Array[(Int, Pt)] = Array.tabulate(numTrajs)(i => (i, trajs(i)(t - 1)))
  def allPoints: Iterator[(Int, Int, Pt)] =
    for (t <- (1 to len).iterator; i <- (0 until numTrajs).iterator) yield (i, t, trajs(i)(t - 1))
}

/** Synthetic trajectory generators standing in for the paper's Porto and
  * GeoLife datasets (offline image — see DESIGN.md §2 for why each
  * generator preserves the properties the experiments depend on). */
object TrajGen {

  /** Smooth heading-random-walk: heading diffuses, speed wobbles in a
    * lognormal band, position reflects at the bounding box. */
  private def walk(rng: Random, bbox: Rect, start: Pt, stepDeg: Double,
                   turnSigma: Double, len: Int): Array[Pt] = {
    val out = new Array[Pt](len)
    var x = start.x; var y = start.y
    var theta = rng.nextDouble() * 2 * math.Pi
    var speed = stepDeg * math.exp(rng.nextGaussian() * 0.3)
    var t = 0
    while (t < len) {
      out(t) = Pt(x, y)
      theta += rng.nextGaussian() * turnSigma
      if (rng.nextDouble() < 0.05) theta = rng.nextDouble() * 2 * math.Pi // junction turn
      speed = math.max(stepDeg * 0.2, math.min(stepDeg * 3.0, speed * math.exp(rng.nextGaussian() * 0.1)))
      x += speed * math.cos(theta)
      y += speed * math.sin(theta)
      // reflect at the box (keep strictly inside for half-open rects)
      if (x <= bbox.x0) { x = bbox.x0 + (bbox.x0 - x) + 1e-9; theta = math.Pi - theta }
      if (x >= bbox.x1) { x = bbox.x1 - (x - bbox.x1) - 1e-9; theta = math.Pi - theta }
      if (y <= bbox.y0) { y = bbox.y0 + (bbox.y0 - y) + 1e-9; theta = -theta }
      if (y >= bbox.y1) { y = bbox.y1 - (y - bbox.y1) - 1e-9; theta = -theta }
      x = math.max(bbox.x0 + 1e-9, math.min(bbox.x1 - 1e-9, x))
      y = math.max(bbox.y0 + 1e-9, math.min(bbox.y1 - 1e-9, y))
      t += 1
    }
    out
  }

  /** Porto-like: taxi motion in a compact urban box (~15 km × 11 km).
    * Step ≈ 150 m per tick (10 m/s at 15 s sampling). */
  def portoLike(n: Int = 400, len: Int = 150, seed: Long = 42): TrajDataset = {
    val bbox = Rect(-8.70, 41.10, -8.52, 41.20)
    val rng = new Random(seed)
    val step = Geo.toDegrees(150.0)
    val trajs = IndexedSeq.tabulate(n) { _ =>
      val start = Pt(bbox.x0 + rng.nextDouble() * bbox.width, bbox.y0 + rng.nextDouble() * bbox.height)
      walk(rng, bbox, start, step, 0.35, len)
    }
    TrajDataset("porto-like", trajs, bbox)
  }

  /** GeoLife-like: ~120 km × 110 km around Beijing, mixed transport modes
    * (walk / car / long-range) with starts clustered downtown — the large
    * spatial span that breaks raw-point quantizers in the paper. */
  def geolifeLike(n: Int = 150, len: Int = 260, seed: Long = 43): TrajDataset = {
    val bbox = Rect(115.8, 39.4, 117.2, 40.4)
    val center = Pt(116.35, 39.9)
    val rng = new Random(seed)
    val trajs = IndexedSeq.tabulate(n) { _ =>
      val mode = rng.nextDouble()
      val step =
        if (mode < 0.3) Geo.toDegrees(45.0)        // walk, 1.5 m/s @ 30 s
        else if (mode < 0.8) Geo.toDegrees(450.0)  // car
        else Geo.toDegrees(1600.0)                 // long-range (train/highway)
      val spread = if (mode < 0.8) 0.06 else 0.25
      val start = Pt(
        math.max(bbox.x0 + 1e-6, math.min(bbox.x1 - 1e-6, center.x + rng.nextGaussian() * spread)),
        math.max(bbox.y0 + 1e-6, math.min(bbox.y1 - 1e-6, center.y + rng.nextGaussian() * spread)))
      walk(rng, bbox, start, step, if (mode < 0.8) 0.3 else 0.12, len)
    }
    TrajDataset("geolife-like", trajs, bbox)
  }

  /** sub-Porto construction for REST (§6.1): base trajectories plus
    * `copies` similar ones each, produced by down-sampling + noise
    * (following [23]). Returns (compression targets, reference pool). */
  def subPorto(base: Int = 60, copies: Int = 4, len: Int = 120, seed: Long = 44,
               noiseMeters: Double = 30.0): (IndexedSeq[Array[Pt]], IndexedSeq[Array[Pt]]) = {
    val porto = portoLike(base, len, seed)
    val rng = new Random(seed + 1)
    val noise = Geo.toDegrees(noiseMeters)
    val refs = IndexedSeq.newBuilder[Array[Pt]]
    val targets = IndexedSeq.newBuilder[Array[Pt]]
    for (traj <- porto.trajs) {
      targets += traj
      for (_ <- 0 until copies) {
        // down-sample by 2 then linearly re-interpolate + jitter
        val ds = traj.indices.by(2).map(traj(_)).toArray
        val up = Array.tabulate(traj.length) { i =>
          val j = math.min(ds.length - 1, i / 2)
          val k = math.min(ds.length - 1, j + 1)
          val f = (i % 2) * 0.5
          Pt(ds(j).x * (1 - f) + ds(k).x * f + rng.nextGaussian() * noise,
             ds(j).y * (1 - f) + ds(k).y * f + rng.nextGaussian() * noise)
        }
        refs += up
      }
    }
    (targets.result(), refs.result())
  }
}
