package repro.core

import scala.collection.mutable

/** Incrementally grown codebook guaranteeing ‖e − C(b)‖₂ ≤ eps for every
  * assignment (Def. 3.2 / Eq. 3). New codewords are appended whenever a
  * sample has no codeword within the bound — the paper's "additional
  * codewords are added to update C" rule for dynamic data. A uniform grid
  * hash of cell size eps makes nearest-within-eps O(1) amortised. */
final class ErrorBoundedCodebook(val eps: Double) {
  require(eps > 0, "eps must be positive")
  private val words = mutable.ArrayBuffer.empty[Pt]
  private val grid = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Int]]

  private def key(cx: Long, cy: Long): Long = (cx << 32) ^ (cy & 0xffffffffL)
  private def cellX(p: Pt): Long = math.floor(p.x / eps).toLong
  private def cellY(p: Pt): Long = math.floor(p.y / eps).toLong

  def size: Int = words.length
  def apply(i: Int): Pt = words(i)
  def codewords: IndexedSeq[Pt] = words.toIndexedSeq

  /** Index of the nearest codeword within eps, or -1 if none qualifies.
    * A ball of radius eps around p only reaches the 3×3 cell neighbourhood. */
  def nearestWithin(p: Pt): Int = {
    val cx = cellX(p); val cy = cellY(p)
    var best = -1
    var bestD = eps
    var dx = -1L
    while (dx <= 1) {
      var dy = -1L
      while (dy <= 1) {
        grid.get(key(cx + dx, cy + dy)) match {
          case Some(ids) =>
            var i = 0
            while (i < ids.length) {
              val d = words(ids(i)).dist(p)
              if (d <= bestD) { bestD = d; best = ids(i) }
              i += 1
            }
          case None =>
        }
        dy += 1
      }
      dx += 1
    }
    best
  }

  /** Assign p to a codeword within eps, creating one at p if needed. */
  def quantize(p: Pt): Int = {
    val i = nearestWithin(p)
    if (i >= 0) i else add(p)
  }

  def add(p: Pt): Int = {
    val i = words.length
    words += p
    grid.getOrElseUpdate(key(cellX(p), cellY(p)), mutable.ArrayBuffer.empty) += i
    i
  }
}

/** Lloyd's k-means over d-dimensional vectors — the fixed-size vector
  * quantizer used by the equal-budget experiments (Tables 2–4) and by the
  * baselines. Deterministic in (input, k, seed); empty clusters are
  * reseeded from the point farthest from its centroid. */
object KMeans {

  private def dist2(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  def cluster(vecs: Array[Array[Double]], k0: Int, iters: Int = 15, seed: Long = 7
             ): (Array[Array[Double]], Array[Int]) = {
    val n = vecs.length
    if (n == 0) return (Array.empty, Array.empty)
    val k = math.max(1, math.min(k0, n))
    val dim = vecs(0).length
    val rng = new scala.util.Random(seed)
    val cents: Array[Array[Double]] =
      rng.shuffle(vecs.indices.toVector).take(k).map(i => vecs(i).clone).toArray
    val assign = new Array[Int](n)
    java.util.Arrays.fill(assign, -1)
    var it = 0
    var changed = true
    val far = new Array[Double](n)
    while (it < iters && changed) {
      changed = false
      var i = 0
      while (i < n) {
        var best = 0; var bd = Double.MaxValue
        var c = 0
        while (c < k) { val d = dist2(vecs(i), cents(c)); if (d < bd) { bd = d; best = c }; c += 1 }
        far(i) = bd
        if (assign(i) != best) { assign(i) = best; changed = true }
        i += 1
      }
      val sums = Array.ofDim[Double](k, dim)
      val cnt = new Array[Int](k)
      i = 0
      while (i < n) {
        val c = assign(i); cnt(c) += 1
        var d = 0
        while (d < dim) { sums(c)(d) += vecs(i)(d); d += 1 }
        i += 1
      }
      var c = 0
      while (c < k) {
        if (cnt(c) > 0) {
          var d = 0
          while (d < dim) { cents(c)(d) = sums(c)(d) / cnt(c); d += 1 }
        } else {
          // Reseed an empty cluster from the worst-served point.
          var worst = 0; var wd = -1.0
          var j = 0
          while (j < n) { if (far(j) > wd) { wd = far(j); worst = j }; j += 1 }
          cents(c) = vecs(worst).clone
          far(worst) = 0.0
          changed = true
        }
        c += 1
      }
      it += 1
    }
    (cents, assign)
  }

  def clusterPts(pts: Array[Pt], k: Int, iters: Int = 15, seed: Long = 7): (Array[Pt], Array[Int]) = {
    val (cs, as) = cluster(pts.map(p => Array(p.x, p.y)), k, iters, seed)
    (cs.map(c => Pt(c(0), c(1))), as)
  }

  def cluster1D(xs: Array[Double], k: Int, iters: Int = 15, seed: Long = 7): (Array[Double], Array[Int]) = {
    val (cs, as) = cluster(xs.map(x => Array(x)), k, iters, seed)
    (cs.map(_(0)), as)
  }
}
