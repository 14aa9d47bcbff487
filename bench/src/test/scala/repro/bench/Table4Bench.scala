package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.TrajGen
import repro.eval._

/** Table 4: average ratio of trajectories visited for exact-match queries
  * and MAE against codebook sizes of 5–9 bits. Runs on reduced datasets —
  * this protocol re-runs every method once per bit width. */
class Table4Bench extends AnyFunSuite {

  test("Table 4 — visited ratio and MAE vs codebook bits") {
    val datasets = Seq(
      (TrajGen.portoLike(n = 250, len = 100, seed = 42), EvalConfig.porto, "Porto"),
      (TrajGen.geolifeLike(n = 100, len = 150, seed = 43), EvalConfig.geolife, "Geolife"))
    for ((data, cfg, label) <- datasets) {
      val rows = Table4.run(data, cfg, bitsRange = Seq(5, 6, 7, 8, 9), nQueries = 120)
      println(Table4.render(rows, data.name))
      println(BenchData.paperBlock(s"Table 4, $label (ratio / MAE at 5 and 9 bits)",
        if (label == "Porto") Seq(
          "PPQ-A 0.019/17.53 .. 0.019/23.10 | PPQ-A-basic 0.046/62.03 .. 0.021/18.55",
          "PPQ-S 0.022/19.52 .. 0.022/19.76 | E-PQ 0.112/118.3 .. 0.028/19.16",
          "Q-traj 0.675/1008 .. 0.293/173.0 | RQ 0.502/639.0 .. 0.020/33.29 | PQ 5.655e-3*/3693 .. 4.627e-3*/3024")
        else Seq(
          "PPQ-A 0.067/24.45 .. 0.067/27.85 | PPQ-S 0.067/18.93 .. 0.067/1.620",
          "E-PQ 0.280/46.04 .. 0.149/22.12 | Q-traj 51.83e-3*/6601 .. 1.297e-3*/482.0")))

      def cell(m: String, bits: Int) = rows.find(_.method == m).get.byBits.find(_._1 == bits).get._2
      // PPQ-A/PPQ-S: constant visited ratio (CQC-fixed radius), small MAE.
      val pa = rows.find(_.method == "PPQ-A").get.byBits.map(_._2.ratio)
      assert(math.abs(pa.head - pa.last) < 0.02, s"PPQ-A ratios $pa")
      // Baselines: the visited ratio falls as bits increase (better C).
      assert(cell("Q-trajectory", 9).ratio <= cell("Q-trajectory", 5).ratio)
      assert(cell("E-PQ", 9).ratio <= cell("E-PQ", 5).ratio)
      // And at few bits PPQ-A visits far fewer candidates than Q-trajectory.
      assert(cell("PPQ-A", 5).ratio < cell("Q-trajectory", 5).ratio)
      // MAE falls with bits for the raw-space methods.
      assert(cell("Q-trajectory", 9).maeM < cell("Q-trajectory", 5).maeM)
    }
  }
}
