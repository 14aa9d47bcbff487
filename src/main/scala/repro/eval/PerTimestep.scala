package repro.eval

import repro.core._
import repro.baselines._
import repro.data.TrajDataset
import scala.collection.mutable

/** One method's reconstruction over a whole dataset plus the metadata the
  * table evaluations need: per-timestamp codeword budget actually spent,
  * and the analytic pruning radius when the method has one (CQC bound). */
final case class MethodRun(name: String,
                           recon: Map[(Int, Int), Pt],
                           vPerT: Map[Int, Int],
                           boundRadiusDeg: Option[Double])

/** Shared experiment configuration (defaults follow §6.1). */
final case class EvalConfig(
    k: Int = 2,
    eps1: Double = 0.001,                       // ≈ 111 m
    gsDeg: Double = Geo.toDegrees(50.0),        // CQC grid
    gcDeg: Double = Geo.toDegrees(100.0),       // index grid
    spatialEpsP: Double = 0.05,                 // ε_p, spatial partitions
    autocorrEpsP: Double = 0.05,                // ε_p, AR-coefficient partitions
    epsS: Double = 0.1,                         // ε_s, index partition threshold
    trajStoreLeaf: Int = 1500,
    seed: Long = 7) {
  def cqcRadiusDeg: Double = math.sqrt(2.0) / 2.0 * gsDeg
  def params(mode: PartitionMode, useCqc: Boolean): PpqParams =
    PpqParams(k = k, eps1 = eps1, gs = if (useCqc) Some(gsDeg) else None, mode = mode,
      epsP = mode match {
        case PartitionMode.Spatial => spatialEpsP
        case _ => autocorrEpsP
      }, seed = seed)
}

object EvalConfig {
  def porto: EvalConfig = EvalConfig()
  def geolife: EvalConfig = EvalConfig(spatialEpsP = 0.5, autocorrEpsP = 0.05, epsS = 0.5)
}

/** Per-timestamp pipelines for the equal-codeword-budget protocol of
  * Tables 2–4: every method learns its codebook independently at each
  * timestamp, and the baselines receive the codeword count the PPQ-A
  * bounded run spent at that timestamp (§6.2.1). */
object PerTimestep {

  /** PPQ family, fresh error-bounded codebook per timestamp (Table 2). */
  def runPpqBounded(name: String, data: TrajDataset, mode: PartitionMode,
                    useCqc: Boolean, cfg: EvalConfig): MethodRun = {
    val params = cfg.params(mode, useCqc)
    val fe = new PredictiveFrontend(params)
    val qt = if (useCqc) Some(new CoordinateQuadtree(Cqc.sideFor(cfg.eps1, cfg.gsDeg))) else None
    val recon = mutable.HashMap.empty[(Int, Int), Pt]
    val vPerT = mutable.HashMap.empty[Int, Int]
    for (t <- 1 to data.len) {
      val pts = data.pointsAt(t)
      val plan = fe.plan(t, pts)
      val cb = new ErrorBoundedCodebook(cfg.eps1)
      val recons = new Array[Pt](pts.length)
      var i = 0
      while (i < pts.length) {
        val e = pts(i)._2 - plan.preds(i)
        val rc = plan.preds(i) + cb(cb.quantize(e))
        recons(i) = rc
        val refined = qt match {
          case Some(q) =>
            Cqc.refine(rc, Cqc.encode(pts(i)._2, rc, cfg.eps1, cfg.gsDeg, q), cfg.eps1, cfg.gsDeg, q)
          case None => rc
        }
        recon((pts(i)._1, t)) = refined
        i += 1
      }
      fe.commit(pts, recons)
      vPerT(t) = cb.size
    }
    MethodRun(name, recon.toMap, vPerT.toMap, if (useCqc) Some(cfg.cqcRadiusDeg) else None)
  }

  /** PPQ family with a fixed-size (k-means) error codebook per timestamp
    * (Table 4's 5–9-bit protocol). */
  def runPpqFixed(name: String, data: TrajDataset, mode: PartitionMode,
                  useCqc: Boolean, v: Int, cfg: EvalConfig): MethodRun = {
    val params = cfg.params(mode, useCqc)
    val fe = new PredictiveFrontend(params)
    val qt = if (useCqc) Some(new CoordinateQuadtree(Cqc.sideFor(cfg.eps1, cfg.gsDeg))) else None
    val recon = mutable.HashMap.empty[(Int, Int), Pt]
    for (t <- 1 to data.len) {
      val pts = data.pointsAt(t)
      val plan = fe.plan(t, pts)
      val errors = Array.tabulate(pts.length)(i => pts(i)._2 - plan.preds(i))
      val (cents, assign) = KMeans.clusterPts(errors, v, iters = 10, seed = cfg.seed + t)
      val recons = new Array[Pt](pts.length)
      var i = 0
      while (i < pts.length) {
        val rc = plan.preds(i) + cents(assign(i))
        recons(i) = rc
        val refined = qt match {
          case Some(q) =>
            Cqc.refine(rc, Cqc.encode(pts(i)._2, rc, cfg.eps1, cfg.gsDeg, q), cfg.eps1, cfg.gsDeg, q)
          case None => rc
        }
        recon((pts(i)._1, t)) = refined
        i += 1
      }
      fe.commit(pts, recons)
    }
    MethodRun(name, recon.toMap, Map.empty,
      if (useCqc) Some(cfg.cqcRadiusDeg) else None)
  }

  /** A baseline whose timestep t reconstruction is stepFn(points, v(t)). */
  def runIndependent(name: String, data: TrajDataset, vOf: Int => Int,
                     stepFn: (Array[Pt], Int, Long) => Array[Pt], seed: Long): MethodRun = {
    val recon = mutable.HashMap.empty[(Int, Int), Pt]
    for (t <- 1 to data.len) {
      val pts = data.pointsAt(t)
      val rec = stepFn(pts.map(_._2), math.max(1, vOf(t)), seed + t)
      var i = 0
      while (i < pts.length) { recon((pts(i)._1, t)) = rec(i); i += 1 }
    }
    MethodRun(name, recon.toMap, Map.empty, None)
  }

  /** TrajStore under the Table 2 protocol: the quadtree index grows as the
    * stream arrives; at each timestamp the codeword budget is split over
    * leaves proportionally to their point counts. */
  def runTrajStore(name: String, data: TrajDataset, vOf: Int => Int, cfg: EvalConfig): MethodRun = {
    val idx = new TrajStoreIndex(data.bbox, cfg.trajStoreLeaf)
    val recon = mutable.HashMap.empty[(Int, Int), Pt]
    for (t <- 1 to data.len) {
      val pts = data.pointsAt(t)
      pts.foreach { case (id, p) => idx.insert(id, t, p) }
      for ((id, p) <- TrajStoreQuant.summarizeBudgetAt(idx, t, math.max(1, vOf(t)), cfg.seed + t))
        recon((id, t)) = p
    }
    MethodRun(name, recon.toMap, Map.empty, None)
  }

  /** The full Table 2/3 method suite in the paper's row order. */
  def allBudgetMatched(data: TrajDataset, cfg: EvalConfig): Seq[MethodRun] = {
    val ppqA = runPpqBounded("PPQ-A", data, PartitionMode.Autocorr, useCqc = true, cfg)
    val budget: Int => Int = t => ppqA.vPerT.getOrElse(t, 1)
    Seq(
      ppqA,
      runPpqBounded("PPQ-A-basic", data, PartitionMode.Autocorr, useCqc = false, cfg),
      runPpqBounded("PPQ-S", data, PartitionMode.Spatial, useCqc = true, cfg),
      runPpqBounded("PPQ-S-basic", data, PartitionMode.Spatial, useCqc = false, cfg),
      runPpqBounded("E-PQ", data, PartitionMode.Single, useCqc = false, cfg),
      runIndependent("Q-trajectory", data, budget, QTrajectory.budgetStep, cfg.seed + 1000),
      runIndependent("Residual Quantization", data, budget, ResidualQuantization.budgetStep, cfg.seed + 2000),
      runIndependent("Product Quantization", data, budget, ProductQuantization.budgetStep, cfg.seed + 3000),
      runTrajStore("TrajStore", data, budget, cfg))
  }

  /** The Table 4 suite (no TrajStore, fixed 2^bits codewords per timestamp). */
  def allFixedBits(data: TrajDataset, bits: Int, cfg: EvalConfig): Seq[MethodRun] = {
    val v = 1 << bits
    Seq(
      runPpqFixed("PPQ-A", data, PartitionMode.Autocorr, useCqc = true, v, cfg),
      runPpqFixed("PPQ-A-basic", data, PartitionMode.Autocorr, useCqc = false, v, cfg),
      runPpqFixed("PPQ-S", data, PartitionMode.Spatial, useCqc = true, v, cfg),
      runPpqFixed("PPQ-S-basic", data, PartitionMode.Spatial, useCqc = false, v, cfg),
      runPpqFixed("E-PQ", data, PartitionMode.Single, useCqc = false, v, cfg),
      runIndependent("Q-trajectory", data, _ => v, QTrajectory.budgetStep, cfg.seed + 1000),
      runIndependent("Residual Quantization", data, _ => v, ResidualQuantization.budgetStep, cfg.seed + 2000),
      runIndependent("Product Quantization", data, _ => v, ProductQuantization.budgetStep, cfg.seed + 3000))
  }
}
