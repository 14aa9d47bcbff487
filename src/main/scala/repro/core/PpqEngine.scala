package repro.core

import scala.collection.mutable

/** How trajectory points are grouped for per-partition prediction (§3.2.1). */
sealed trait PartitionMode extends Serializable
object PartitionMode {
  /** Eq. 7: spatial proximity of the current points. */
  case object Spatial extends PartitionMode
  /** Eq. 8: similarity of lag-k AR coefficients. */
  case object Autocorr extends PartitionMode
  /** Single global partition — the plain E-PQ of §3.1. */
  case object Single extends PartitionMode
}

/** Parameters of the PPQ-trajectory summariser. Defaults follow §6.1:
  * ε₁ = 0.001 (≈111 m), g_s = 50 m, g_c = 100 m (held by callers). */
final case class PpqParams(
    k: Int = 2,
    eps1: Double = 0.001,
    gs: Option[Double] = Some(50.0 / Geo.MetersPerDegree),
    mode: PartitionMode = PartitionMode.Autocorr,
    epsP: Double = 0.01,
    predict: Boolean = true,
    arWindow: Int = 12,
    partGrowth: Int = 4,
    seed: Long = 17) extends Serializable

/** Per-point output of the encoder. `recon` is the codebook reconstruction
  * (Eq. 4); `refined` additionally applies CQC (Eq. 11) when enabled. */
final case class CodedPoint(
    trajId: Int, t: Int, part: Int, b: Int,
    cqcBits: Long, cqcLen: Int,
    recon: Pt, refined: Pt) extends Serializable

/** Per-timestamp slice of the summary needed for decoding: the prediction
  * coefficients of each partition and the point→partition assignment. */
final case class StepSummary(t: Int, coeffs: Map[Int, Array[Double]],
                             assign: Map[Int, Int], numParts: Int)

/** The shared predictive front half of PPQ: incremental partitioning,
  * per-partition least-squares coefficients, prediction from the last k
  * *reconstructed* points, and history upkeep. Both the error-bounded
  * encoder and the equal-budget evaluation pipelines (Tables 2–4) run on
  * top of this so they share identical prediction semantics. */
final class PredictiveFrontend(val params: PpqParams) {
  private val hist = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Pt]] // reconstructed, oldest→newest
  private val raw = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Pt]]  // raw, for AR features
  private val partitioner = new IncrementalPartitioner(params.epsP, params.partGrowth, params.seed)

  final case class Plan(assign: Array[Int], coeffs: Map[Int, Array[Double]], preds: Array[Pt], numParts: Int)

  /** Last k reconstructed points of `id`, most recent first ([t-1, t-2, ...]). */
  def histOf(id: Int): Array[Pt] =
    hist.get(id) match {
      case Some(b) if b.length >= params.k =>
        val out = new Array[Pt](params.k)
        var j = 0
        while (j < params.k) { out(j) = b(b.length - 1 - j); j += 1 }
        out
      case _ => Array.empty
    }

  def numPartitions: Int = partitioner.numPartitions

  def plan(t: Int, points: Array[(Int, Pt)]): Plan = {
    val ids = points.map(_._1)
    val assign: Array[Int] = params.mode match {
      case PartitionMode.Single => new Array[Int](points.length)
      case PartitionMode.Spatial =>
        partitioner.update(ids, points.map { case (_, p) => Array(p.x, p.y) })
      case PartitionMode.Autocorr =>
        partitioner.update(ids, points.map { case (id, _) =>
          Predictor.arFeatures(raw.getOrElse(id, mutable.ArrayBuffer.empty[Pt]), params.k, params.arWindow)
        })
    }
    val coeffs = mutable.HashMap.empty[Int, Array[Double]]
    if (params.predict) {
      val byPart = points.indices.groupBy(assign(_))
      for ((p, idxs) <- byPart) {
        val ready = idxs.filter(i => histOf(points(i)._1).length == params.k)
        coeffs(p) =
          if (ready.nonEmpty)
            Predictor.fit(ready.map(i => histOf(points(i)._1)).toArray,
                          ready.map(i => points(i)._2).toArray, params.k)
          else new Array[Double](params.k)
      }
    }
    val preds = new Array[Pt](points.length)
    var i = 0
    while (i < points.length) {
      val h = histOf(points(i)._1)
      preds(i) =
        if (params.predict && h.length == params.k) Predictor.predict(coeffs(assign(i)), h)
        else Pt(0.0, 0.0) // P_j[t] = 0 for t ≤ k (Alg. 1)
      i += 1
    }
    Plan(assign, coeffs.toMap, preds, assign.distinct.length)
  }

  /** Record this step's raw inputs and codebook reconstructions — the
    * reconstructions drive the next step's prediction (Eq. 2 uses T̂). */
  def commit(points: Array[(Int, Pt)], recons: Array[Pt]): Unit = {
    var i = 0
    while (i < points.length) {
      val (id, rp) = points(i)
      val hb = hist.getOrElseUpdate(id, mutable.ArrayBuffer.empty)
      hb += recons(i)
      if (hb.length > params.k + 2) hb.remove(0)
      val rb = raw.getOrElseUpdate(id, mutable.ArrayBuffer.empty)
      rb += rp
      if (rb.length > params.arWindow + params.k + 2) rb.remove(0)
      i += 1
    }
  }
}

/** Algorithm 1 + §3.2: the online error-bounded partition-wise predictive
  * quantizer, with CQC refinement when g_s is set. Feed timestamps in
  * increasing order via `step`; the summary ({P_j[t]}, C, {b_i^t}, CQC) is
  * exposed through `codebook`, `steps` and the returned codes, and
  * `PpqDecoder.reconstruct` replays it byte-exactly. */
final class PpqEncoder(val params: PpqParams) {
  val codebook = new ErrorBoundedCodebook(params.eps1)
  val quadtree: Option[CoordinateQuadtree] =
    params.gs.map(g => new CoordinateQuadtree(Cqc.sideFor(params.eps1, g)))
  private val frontend = new PredictiveFrontend(params)
  val steps = mutable.ArrayBuffer.empty[StepSummary]
  var nPoints = 0L
  var cqcBitsTotal = 0L
  private var assignBitsTotal = 0L

  def numPartitions: Int = frontend.numPartitions

  def step(t: Int, points: Array[(Int, Pt)]): Array[CodedPoint] = {
    val plan = frontend.plan(t, points)
    val out = new Array[CodedPoint](points.length)
    val recons = new Array[Pt](points.length)
    var i = 0
    while (i < points.length) {
      val (id, rp) = points(i)
      val e = rp - plan.preds(i)
      val b = codebook.quantize(e)
      val recon = plan.preds(i) + codebook(b)
      out(i) = quadtree match {
        case Some(qt) =>
          val g = params.gs.get
          val code = Cqc.encode(rp, recon, params.eps1, g, qt)
          cqcBitsTotal += code.len
          CodedPoint(id, t, plan.assign(i), b, code.bits, code.len, recon,
                     Cqc.refine(recon, code, params.eps1, g, qt))
        case None =>
          CodedPoint(id, t, plan.assign(i), b, 0L, 0, recon, recon)
      }
      recons(i) = recon
      i += 1
    }
    frontend.commit(points, recons)
    nPoints += points.length
    assignBitsTotal += points.length.toLong * MathUtil.ceilLog2(math.max(plan.numParts, 2))
    steps += StepSummary(t, plan.coeffs, points.map(_._1).zip(plan.assign).toMap, plan.numParts)
    out
  }

  /** Size of the summary ({P_j[t]}, C, {b_i^t}, CQC, assignments) in bits —
    * the numerator-side of the paper's compression-ratio measure. */
  def summaryBits: Long =
    codebook.size.toLong * 2 * 64 +
      nPoints * MathUtil.ceilLog2(math.max(codebook.size, 2)) +
      cqcBitsTotal +
      steps.iterator.map(s => s.coeffs.size.toLong * params.k * 64).sum +
      assignBitsTotal

  /** raw bits (2×64 per point) over summary bits. */
  def compressionRatio: Double = nPoints * 128.0 / summaryBits
}

/** Reconstructs every trajectory point from the summary alone — the check
  * that ({P_j[t]}, C, {b_i^t}, CQC) "are enough to reproduce any
  * trajectory" (§5). Uses only (trajId, t, part, b, cqc) from the codes. */
object PpqDecoder {
  def reconstruct(params: PpqParams, codewords: IndexedSeq[Pt],
                  steps: Seq[StepSummary], codes: Seq[CodedPoint]): Map[(Int, Int), Pt] = {
    val qt = params.gs.map(g => new CoordinateQuadtree(Cqc.sideFor(params.eps1, g)))
    val byT = codes.groupBy(_.t)
    val hist = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Pt]]
    val out = mutable.HashMap.empty[(Int, Int), Pt]
    for (s <- steps.sortBy(_.t); cp <- byT.getOrElse(s.t, Seq.empty)) {
      val hb = hist.get(cp.trajId)
      val h: Array[Pt] = hb match {
        case Some(b) if b.length >= params.k =>
          val a = new Array[Pt](params.k)
          var j = 0
          while (j < params.k) { a(j) = b(b.length - 1 - j); j += 1 }
          a
        case _ => Array.empty
      }
      val pred =
        if (params.predict && h.length == params.k) Predictor.predict(s.coeffs(cp.part), h)
        else Pt(0.0, 0.0)
      val recon = pred + codewords(cp.b)
      val refined = qt match {
        case Some(q) => Cqc.refine(recon, CqcCode(cp.cqcBits, cp.cqcLen), params.eps1, params.gs.get, q)
        case None => recon
      }
      val b = hist.getOrElseUpdate(cp.trajId, mutable.ArrayBuffer.empty)
      b += recon
      if (b.length > params.k + 2) b.remove(0)
      out((cp.trajId, cp.t)) = refined
    }
    out.toMap
  }
}
