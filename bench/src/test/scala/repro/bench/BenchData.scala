package repro.bench

import repro.data.{TrajDataset, TrajGen}
import repro.eval._

/** Shared bench inputs: datasets at evaluation scale and the (expensive)
  * budget-matched method runs, computed once per JVM — the bench project
  * runs all suites in one forked JVM (`Test / parallelExecution := false`).
  *
  * Scales are far below the paper's 74M/25M points (this is a simulation
  * substrate, see DESIGN.md §2); shapes, not absolute numbers, are the
  * reproduction target.
  */
object BenchData {
  lazy val porto: TrajDataset = TrajGen.portoLike(n = 400, len = 150, seed = 42)
  lazy val geolife: TrajDataset = TrajGen.geolifeLike(n = 150, len = 260, seed = 43)

  lazy val portoRuns: Seq[MethodRun] = PerTimestep.allBudgetMatched(porto, EvalConfig.porto)
  lazy val geolifeRuns: Seq[MethodRun] = PerTimestep.allBudgetMatched(geolife, EvalConfig.geolife)

  def datasets: Seq[(TrajDataset, EvalConfig, Seq[MethodRun])] = Seq(
    (porto, EvalConfig.porto, portoRuns),
    (geolife, EvalConfig.geolife, geolifeRuns))

  /** Render a block of the paper's published numbers next to ours. */
  def paperBlock(title: String, lines: Seq[String]): String =
    (s"-- paper ($title) --" +: lines.map("   " + _)).mkString("\n")
}
