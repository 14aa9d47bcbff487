package repro.jobs

import repro.data.TrajGen
import repro.eval._

/** Entrypoint that regenerates any evaluation table outside the bench
  * harness (no SparkSession needed — the table experiments exercise the
  * sequential engines the distributed layer composes).
  *
  * Usage: TablesJob <2|3|4|56|78|9|compression> [scale]
  */
object TablesJob {
  def main(args: Array[String]): Unit = {
    val which = args.lift(0).getOrElse("2")
    val scale = args.lift(1).map(_.toDouble).getOrElse(1.0)
    def porto = TrajGen.portoLike((400 * scale).toInt.max(30), (150 * scale).toInt.max(30))
    def geolife = TrajGen.geolifeLike((150 * scale).toInt.max(30), (260 * scale).toInt.max(30))
    which match {
      case "2" =>
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife))) {
          val runs = PerTimestep.allBudgetMatched(data, cfg)
          println(Table2.render(Table2.evaluate(runs, data, cfg, nQueries = 200), data.name))
        }
      case "3" =>
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife))) {
          val runs = PerTimestep.allBudgetMatched(data, cfg)
          println(Table3.render(Table3.evaluate(runs, data), data.name))
        }
      case "4" =>
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife)))
          println(Table4.render(Table4.run(data, cfg), data.name))
      case "56" =>
        val devs = Seq(200.0, 400.0, 600.0, 800.0, 1000.0)
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife))) {
          val rows = Table56.run(data, devs, cfg)
          println(Table56.renderTime(rows, data.name))
          println(Table56.renderCodewords(rows, data.name))
          println(Table56.renderCompression(rows, data.name, 128, data.numPoints))
        }
      case "78" =>
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife))) {
          println(Table78.render(s"Table 7 — ${data.name}",
            Table78.sweepEpsC(data, Seq(0.2, 0.4, 0.6, 0.8), 0.5, cfg), "eps_c"))
          println(Table78.render(s"Table 8 — ${data.name}",
            Table78.sweepEpsD(data, Seq(0.2, 0.4, 0.6, 0.8), 0.5, cfg), "eps_d"))
        }
      case "9" =>
        for ((data, cfg) <- Seq((porto, EvalConfig.porto), (geolife, EvalConfig.geolife)))
          println(Table9.render(Table9.run(data, cfg), data.name))
      case "compression" =>
        println(CompressionEval.render(CompressionEval.run(Seq(200.0, 400.0, 600.0, 800.0, 1000.0))))
      case other => sys.error(s"unknown table: $other")
    }
  }
}
