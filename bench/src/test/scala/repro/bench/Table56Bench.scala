package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** Tables 5 + 6: summary building time and codebook size against target
  * spatial deviation (200–1000 m), plus the compression-ratio analogue. */
class Table56Bench extends AnyFunSuite {

  test("Tables 5/6 — build time and #codewords vs spatial deviation") {
    val devs = Seq(200.0, 400.0, 600.0, 800.0, 1000.0)
    for ((data, cfg, _) <- BenchData.datasets) {
      val rows = Table56.run(data, devs, cfg)
      println(Table56.renderTime(rows, data.name))
      println(Table56.renderCodewords(rows, data.name))
      println(Table56.renderCompression(rows, data.name, 128, data.numPoints))
      val label = if (data.name.startsWith("porto")) "Porto" else "Geolife"
      println(BenchData.paperBlock(s"Table 5 (s) + Table 6 (x1e4 words), $label, 200m..1000m",
        if (label == "Porto") Seq(
          "time: PPQ-A 802..418 | PPQ-S 633..348 | E-PQ 6543..1157 | Q-traj 16027..2789 | RQ 4765..1094 | PQ 4883..2353 | TrajStore 12826..4870",
          "words: PPQ-A 0.283..0.069 | PPQ-S 0.284..0.082 | E-PQ 3.182..0.500 | Q-traj 16.37..2.501 | RQ 5.329..0.864 | PQ 5.175..0.845 | TrajStore 7.617..1.173")
        else Seq(
          "time: PPQ-A 706..346 | PPQ-S 800..446 | E-PQ 647..459 | Q-traj 10698..4152 | RQ 13199..4655 | PQ 21113..3073 | TrajStore 44588..27063",
          "words: PPQ-A 0.375..0.156 | PPQ-S 0.487..0.183 | E-PQ 0.804..0.280 | Q-traj 29.66..7.157 | RQ 29.74..7.179 | PQ 29.24..6.982 | TrajStore 35.64..7.724")))

      def r(m: String, d: Double) = rows.find(x => x.method == m && x.devM == d).get
      for (d <- devs) {
        // Table 6 ordering: PPQ codebooks are the smallest; quantizing raw
        // points (Q-trajectory) costs the most codewords.
        assert(r("PPQ-A", d).codewords < r("Q-trajectory", d).codewords)
        assert(r("PPQ-S", d).codewords < r("Q-trajectory", d).codewords)
        assert(r("E-PQ", d).codewords <= r("Q-trajectory", d).codewords)
        assert(r("Residual Quantization", d).codewords < r("Q-trajectory", d).codewords)
        assert(r("Product Quantization", d).codewords < r("Q-trajectory", d).codewords)
      }
      // Codeword counts fall as the allowed deviation grows (every method).
      for (m <- Table56.methods)
        assert(r(m, 1000.0).codewords <= r(m, 200.0).codewords, s"$m grows with deviation")
      // Table 5 ordering: the PPQ summary builds faster than quantizing
      // raw space at the tightest deviation (the paper's headline), and
      // raw-space quantization gets cheaper as the deviation loosens.
      // (Absolute-time shapes involving TrajStore/PPQ-A don't transfer to
      // this scale — the paper's TrajStore cost is merge/split churn over
      // 74M points, trivial at 60k; see EXPERIMENTS.md.)
      assert(r("PPQ-S", 200.0).timeSec < r("Q-trajectory", 200.0).timeSec)
      assert(r("Q-trajectory", 1000.0).timeSec <= r("Q-trajectory", 200.0).timeSec)
    }
  }
}
