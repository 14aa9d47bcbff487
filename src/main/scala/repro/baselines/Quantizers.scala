package repro.baselines

import repro.core._

/** Q-trajectory (§6.1): the PPQ pipeline with the prediction skipped —
  * raw points are quantized directly. Error-bounded variant for Tables
  * 5/6, fixed-budget (k-means per timestamp) variant for Tables 2–4. */
object QTrajectory {

  /** Error-bounded: one incrementally grown codebook over all raw points. */
  final class Bounded(epsDeg: Double) {
    val codebook = new ErrorBoundedCodebook(epsDeg)
    def quantize(p: Pt): Pt = codebook(codebook.quantize(p))
    def codewords: Int = codebook.size
  }

  /** Fixed budget: k-means with v centroids over this timestamp's points. */
  def budgetStep(points: Array[Pt], v: Int, seed: Long): Array[Pt] = {
    val (cents, assign) = KMeans.clusterPts(points, v, seed = seed)
    points.indices.map(i => cents(assign(i))).toArray
  }
}

/** Product Quantization [19] adapted to 2-D trajectory points: independent
  * sub-quantizers per coordinate. The stored codeword count is n_x + n_y
  * while the representable grid is n_x · n_y — which is why PQ's codebook
  * is smaller than Q-trajectory's in Table 6. */
object ProductQuantization {

  /** Error-bounded: each dimension bounded by eps/√2 so the joint L2
    * deviation stays ≤ eps. */
  final class Bounded(epsDeg: Double) {
    private val epsDim = epsDeg / math.sqrt(2.0)
    private val cbX = new ErrorBoundedCodebook(epsDim)
    private val cbY = new ErrorBoundedCodebook(epsDim)
    def quantize(p: Pt): Pt =
      Pt(cbX(cbX.quantize(Pt(p.x, 0.0))).x, cbY(cbY.quantize(Pt(p.y, 0.0))).x)
    def codewords: Int = cbX.size + cbY.size
  }

  /** Fixed budget: v/2 centroids per dimension (total stored = v). */
  def budgetStep(points: Array[Pt], v: Int, seed: Long): Array[Pt] = {
    val vd = math.max(1, v / 2)
    val (cx, ax) = KMeans.cluster1D(points.map(_.x), vd, seed = seed)
    val (cy, ay) = KMeans.cluster1D(points.map(_.y), vd, seed = seed + 1)
    points.indices.map(i => Pt(cx(ax(i)), cy(ay(i)))).toArray
  }
}

/** Residual Quantization [8]: a coarse first stage followed by a residual
  * stage. Error-bounded variant bounds stage 1 at `coarseFactor`·eps and
  * stage 2 at eps (so the final deviation is ≤ eps); fixed-budget variant
  * splits the codeword budget evenly across the two stages. */
object ResidualQuantization {

  final class Bounded(epsDeg: Double, coarseFactor: Double = 8.0) {
    private val stage1 = new ErrorBoundedCodebook(epsDeg * coarseFactor)
    private val stage2 = new ErrorBoundedCodebook(epsDeg)
    def quantize(p: Pt): Pt = {
      val c1 = stage1(stage1.quantize(p))
      val r = p - c1
      c1 + stage2(stage2.quantize(r))
    }
    def codewords: Int = stage1.size + stage2.size
  }

  def budgetStep(points: Array[Pt], v: Int, seed: Long): Array[Pt] = {
    val v1 = math.max(1, v / 2)
    val v2 = math.max(1, v - v1)
    val (c1, a1) = KMeans.clusterPts(points, v1, seed = seed)
    val residuals = points.indices.map(i => points(i) - c1(a1(i))).toArray
    val (c2, a2) = KMeans.clusterPts(residuals, v2, seed = seed + 1)
    points.indices.map(i => c1(a1(i)) + c2(a2(i))).toArray
  }
}
