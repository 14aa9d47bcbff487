package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** Table 3: MAE against different lengths of TPQ. */
class Table3Bench extends AnyFunSuite {

  test("Table 3 — TPQ MAE vs path length") {
    for ((data, _, runs) <- BenchData.datasets) {
      val rows = Table3.evaluate(runs, data, lengths = Seq(10, 20, 30, 40, 50), nQueries = 300)
      println(Table3.render(rows, data.name))
      println(BenchData.paperBlock("Table 3 (km), " + (if (data.name.startsWith("porto")) "Porto" else "Geolife"),
        if (data.name.startsWith("porto")) Seq(
          "l=10..50: PPQ-A 0.046..0.158 | PPQ-A-basic 0.357..1.437 | PPQ-S 0.160..0.566",
          "PPQ-S-basic 0.338..1.374 | E-PQ 0.068..0.229 | Q-traj 24.90..91.75",
          "RQ 3.684..13.66 | PQ 1.813..6.600 | TrajStore 5.665..22.04")
        else Seq(
          "l=10..50: PPQ-A 0.011..0.050 | PPQ-A-basic 0.073..0.337 | PPQ-S 0.019..0.086",
          "PPQ-S-basic 0.135..0.621 | E-PQ 0.031..0.139 | Q-traj 190.2..861.1",
          "RQ 150.7..692.6 | PQ 48.78..2289 | TrajStore 7.703..36.17")))

      def mae(m: String, l: Int) = rows.find(_.method == m).get.maeByL.find(_._1 == l).get._2
      // PPQ answers path queries with far smaller deviation than the
      // raw-space baselines at every length (the paper's ordering).
      for (l <- Seq(10, 30, 50)) {
        assert(mae("PPQ-A", l) < mae("Q-trajectory", l))
        assert(mae("PPQ-A", l) < mae("Residual Quantization", l))
        assert(mae("PPQ-A", l) < mae("Product Quantization", l))
        assert(mae("PPQ-A", l) < mae("TrajStore", l))
        assert(mae("PPQ-A", l) <= mae("PPQ-A-basic", l))
      }
    }
  }
}
