package repro.baselines

import repro.core._
import scala.collection.mutable

/** REST [44]: reference-based trajectory compression. A trajectory is
  * greedily covered by the longest sub-trajectory of a reference set that
  * matches pointwise within a spatial deviation bound; uncovered points
  * are stored raw. Only the compression-ratio comparison uses this
  * baseline (the paper's Fig. 9c / sub-Porto setting). */
object Rest {

  final case class RefSet(refs: IndexedSeq[Array[Pt]], epsDeg: Double) {
    /** Spatial hash of every reference point at cell size eps for fast
      * candidate (ref, offset) lookup. */
    private[Rest] val grid: mutable.HashMap[Long, mutable.ArrayBuffer[(Int, Int)]] = {
      val g = mutable.HashMap.empty[Long, mutable.ArrayBuffer[(Int, Int)]]
      for (r <- refs.indices; j <- refs(r).indices) {
        val k = key(refs(r)(j))
        g.getOrElseUpdate(k, mutable.ArrayBuffer.empty) += ((r, j))
      }
      g
    }
    private[Rest] def key(p: Pt): Long =
      (math.floor(p.x / epsDeg).toLong << 32) ^ (math.floor(p.y / epsDeg).toLong & 0xffffffffL)
    private[Rest] def candidates(p: Pt): Iterator[(Int, Int)] = {
      val cx = math.floor(p.x / epsDeg).toLong
      val cy = math.floor(p.y / epsDeg).toLong
      for {
        dx <- Iterator(-1L, 0L, 1L)
        dy <- Iterator(-1L, 0L, 1L)
        hit <- grid.getOrElse((cx + dx) << 32 ^ ((cy + dy) & 0xffffffffL), mutable.ArrayBuffer.empty).iterator
      } yield hit
    }
  }

  final case class Compressed(segments: Int, rawPoints: Int, bits: Long)

  /** Greedy longest-match cover. Storage model: a matched segment costs
    * (refId + offset + length) ≈ 3×32 bits; a raw point costs 2×64 bits. */
  def compress(traj: Array[Pt], refSet: RefSet): Compressed = {
    val eps = refSet.epsDeg
    var i = 0
    var segments = 0
    var rawPoints = 0
    var bits = 0L
    while (i < traj.length) {
      var bestLen = 0
      for ((r, j) <- refSet.candidates(traj(i))) {
        val ref = refSet.refs(r)
        if (ref(j).dist(traj(i)) <= eps) {
          var l = 0
          while (i + l < traj.length && j + l < ref.length && ref(j + l).dist(traj(i + l)) <= eps) l += 1
          if (l > bestLen) bestLen = l
        }
      }
      if (bestLen >= 2) { segments += 1; bits += 3 * 32; i += bestLen }
      else { rawPoints += 1; bits += 2 * 64; i += 1 }
    }
    Compressed(segments, rawPoints, bits)
  }

  /** Dataset compression ratio: raw bits over compressed bits (the
    * reference set is pre-shared, as in the paper's setting). */
  def compressionRatio(trajs: Seq[Array[Pt]], refs: IndexedSeq[Array[Pt]], epsDeg: Double): Double = {
    val refSet = RefSet(refs, epsDeg)
    var raw = 0L
    var comp = 0L
    for (t <- trajs) {
      raw += t.length.toLong * 2 * 64
      comp += compress(t, refSet).bits
    }
    raw.toDouble / math.max(comp, 1L)
  }
}
