package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval._

/** Tables 7 + 8: TPI statistics on different ε_c and ε_d. */
class Table78Bench extends AnyFunSuite {

  test("Table 7 — TPI statistics vs eps_c (eps_d = 0.5)") {
    for ((data, cfg, _) <- BenchData.datasets) {
      val rows = Table78.sweepEpsC(data, Seq(0.2, 0.4, 0.6, 0.8), epsD = 0.5, cfg)
      println(Table78.render(s"Table 7 — ${data.name}", rows, "eps_c"))
      val label = if (data.name.startsWith("porto")) "Porto" else "Geolife"
      println(BenchData.paperBlock(s"Table 7, $label (size MB / time s / periods / insertions)",
        if (label == "Porto") Seq(
          "0.2: 863.1/1346/1245/4367 | 0.4: 860.1/544/656/7207",
          "0.6: 859.4/458/485/7198 | 0.8: 859.1/418/421/6637")
        else Seq(
          "0.2: 250.0/7003/14627/71448 | 0.4: 241.6/3792/10100/89492",
          "0.6: 237.6/3028/7117/95308 | 0.8: 237.3/2935/6876/101187")))
      // Higher eps_c tolerates larger TRD drops: fewer periods (re-builds).
      assert(rows.last.periods <= rows.head.periods,
        s"periods ${rows.map(_.periods)}")
      assert(rows.forall(_.sizeMB > 0))
    }
  }

  test("Table 8 — TPI statistics vs eps_d (eps_c = 0.5)") {
    for ((data, cfg, _) <- BenchData.datasets) {
      val rows = Table78.sweepEpsD(data, Seq(0.2, 0.4, 0.6, 0.8), epsC = 0.5, cfg)
      println(Table78.render(s"Table 8 — ${data.name}", rows, "eps_d"))
      val label = if (data.name.startsWith("porto")) "Porto" else "Geolife"
      println(BenchData.paperBlock(s"Table 8, $label (size MB / time s / periods / insertions)",
        if (label == "Porto") Seq(
          "0.2: 862.0/1252/1136/4457 | 0.4: 860.0/497/625/5716",
          "0.6: 859.9/480/355/6613 | 0.8: 857.4/465/245/7326")
        else Seq(
          "0.2: 249.2/6535/13958/55951 | 0.4: 238.2/4445/7953/66400",
          "0.6: 236.5/3145/5670/88033 | 0.8: 235.1/2848/3567/90554")))
      // Higher eps_d reuses a PI for more timestamps: fewer periods.
      assert(rows.last.periods <= rows.head.periods,
        s"periods ${rows.map(_.periods)}")
      // Fewer rebuilds leave more timestamps to be covered by insertions.
      assert(rows.last.insertions >= rows.head.insertions ||
             rows.last.periods < rows.head.periods)
    }
  }
}
