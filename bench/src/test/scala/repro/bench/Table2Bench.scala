package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** Table 2: quality of summaries and STRQ precision/recall. */
class Table2Bench extends AnyFunSuite {

  test("Table 2 — quality of summaries and STRQ evaluation") {
    for ((data, cfg, runs) <- BenchData.datasets) {
      val rows = Table2.evaluate(runs, data, cfg, nQueries = 300)
      println(Table2.render(rows, data.name))
      println(BenchData.paperBlock("Table 2, " + (if (data.name.startsWith("porto")) "Porto" else "Geolife"),
        if (data.name.startsWith("porto")) Seq(
          "PPQ-A 18.35 1.000 1.000 | PPQ-A-basic 51.92 0.951 0.948 | PPQ-S 23.30 1.000 1.000",
          "PPQ-S-basic 44.41 0.944 0.939 | E-PQ 76.60 0.931 0.926 | Q-traj 1752.29 0.425 0.427",
          "RQ 868.96 0.675 0.675 | PQ 641.34 0.736 0.725 | TrajStore 152.13 0.917 0.919")
        else Seq(
          "PPQ-A 4.85 1.000 1.000 | PPQ-A-basic 6.17 0.987 0.987 | PPQ-S 7.89 1.000 1.000",
          "PPQ-S-basic 14.72 0.976 0.976 | E-PQ 15.06 0.962 0.961 | Q-traj 29105 x x",
          "RQ 22590 x x | PQ 21228 x x | TrajStore 617.76 0.854 0.855")))

      def row(m: String) = rows.find(_.method == m).get
      // Shape assertions mirroring the paper's ordering claims:
      assert(row("PPQ-A").precision == 1.0 && row("PPQ-A").recall == 1.0)
      assert(row("PPQ-S").precision == 1.0 && row("PPQ-S").recall == 1.0)
      assert(row("PPQ-A").maeM < row("E-PQ").maeM || row("PPQ-S").maeM < row("E-PQ").maeM)
      assert(row("PPQ-A").maeM < row("Q-trajectory").maeM)
      assert(row("PPQ-A").maeM < row("Residual Quantization").maeM)
      assert(row("PPQ-A").maeM < row("Product Quantization").maeM)
      assert(row("PPQ-A").maeM < row("TrajStore").maeM)
      // CQC refinement helps
      assert(row("PPQ-A").maeM <= row("PPQ-A-basic").maeM)
      assert(row("PPQ-S").maeM <= row("PPQ-S-basic").maeM)
      // raw-space quantizers lose precision/recall badly vs PPQ
      assert(row("Q-trajectory").recall < row("PPQ-A-basic").recall)
    }
  }
}
