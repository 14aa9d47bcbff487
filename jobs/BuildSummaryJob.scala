package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.TrajGen
import repro.spark.SparkPpq

/** spark-submit entrypoint: generate a trajectory dataset, build the
  * distributed PPQ summary (one codebook per executor-side spatial group),
  * and print per-group codebook statistics plus overall MAE.
  *
  * Usage: BuildSummaryJob [numTrajs] [len] [numGroups]
  */
object BuildSummaryJob {
  def main(args: Array[String]): Unit = {
    val n = args.lift(0).map(_.toInt).getOrElse(200)
    val len = args.lift(1).map(_.toInt).getOrElse(80)
    val numGroups = args.lift(2).map(_.toInt).getOrElse(8)
    val spark = SparkSession.builder().appName("ppq-build-summary")
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]")).getOrCreate()
    import spark.implicits._
    try {
      val data = TrajGen.portoLike(n, len)
      val raw = data.allPoints.map { case (id, t, p) => SparkPpq.PointRow(id, t, p.x, p.y) }.toSeq.toDF()
      val params = PpqParams()
      val summary = SparkPpq.buildSummary(spark, raw, params, numGroups)
      summary.cache()
      val stats = SparkPpq.groupStats(spark, raw, params, numGroups).collect().sortBy(_.group)
      println(f"points=${summary.count()}%d groups=${stats.length}%d")
      stats.foreach(s => println(
        f"group=${s.group}%2d codewords=${s.codewords}%5d points=${s.points}%7d summaryKB=${s.summary_bits / 8192.0}%.1f"))
      val joined = summary.toDF().join(raw, Seq("traj_id", "t"))
      val mae = joined.selectExpr(
        s"avg(sqrt((xr - x)*(xr - x) + (yr - y)*(yr - y))) * ${Geo.MetersPerDegree} as mae")
        .collect()(0).getDouble(0)
      println(f"MAE over summary: $mae%.2f m")
    } finally spark.stop()
  }
}
