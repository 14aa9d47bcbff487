package repro.spark

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.Oracle
import repro.core._
import repro.data.TrajGen
import repro.query.Queries

class SparkPpqSpec extends SparkSpec {

  private lazy val data = TrajGen.portoLike(60, 25, seed = 51)
  private val params = PpqParams(epsP = 0.05, mode = PartitionMode.Spatial)
  private val gc = Geo.toDegrees(100.0)

  private lazy val rawDf = {
    import spark.implicits._
    data.allPoints.map { case (id, t, p) => SparkPpq.PointRow(id, t, p.x, p.y) }
      .toSeq.toDF().cache()
  }

  private lazy val summary = SparkPpq.buildSummary(spark, rawDf, params, numGroups = 4).cache()

  test("assignGroups maps every trajectory to exactly one group") {
    val g = SparkPpq.assignGroups(rawDf, 0.05, 4).collect()
    assert(g.length == data.numTrajs)
    assert(g.map(_.getInt(1)).forall(x => x >= 0 && x < 4))
  }

  test("summary has one row per raw point") {
    assert(summary.count() == data.numPoints)
  }

  test("distributed summary respects the CQC deviation bound per point") {
    val bound = math.sqrt(2.0) / 2.0 * params.gs.get + 1e-12
    val joined = summary.toDF().join(rawDf, Seq("traj_id", "t"))
      .select(col("xr"), col("yr"), col("x"), col("y")).collect()
    assert(joined.length == data.numPoints)
    for (r <- joined) {
      val d = Pt(r.getDouble(0), r.getDouble(1)).dist(Pt(r.getDouble(2), r.getDouble(3)))
      assert(d <= bound, s"deviation ${Geo.toMeters(d)} m")
    }
  }

  test("distributed MAE matches a single-node encoder per group (within bound)") {
    val joined = summary.toDF().join(rawDf, Seq("traj_id", "t"))
    val mae = joined.select(
      (avg(sqrt((col("xr") - col("x")) * (col("xr") - col("x")) +
                (col("yr") - col("y")) * (col("yr") - col("y")))) * Geo.MetersPerDegree).as("mae"))
      .collect()(0).getDouble(0)
    assert(mae > 0 && mae <= Geo.toMeters(math.sqrt(2.0) / 2.0 * params.gs.get))
  }

  test("groupStats reports codebooks per spatial group") {
    val stats = SparkPpq.groupStats(spark, rawDf, params, numGroups = 4).collect()
    assert(stats.nonEmpty && stats.length <= 4)
    assert(stats.map(_.points).sum == data.numPoints)
    assert(stats.forall(_.codewords > 0))
    assert(stats.forall(_.summary_bits > 0))
  }

  test("approximate STRQ via DataFrame filter finds most of the truth") {
    // without local search a reconstruction can land one cell over, so a
    // single query may legitimately miss — measure the hit rate instead
    val indexed = SparkPpq.withCells(summary.toDF(), gc, data.bbox.x0, data.bbox.y0).cache()
    val qs = Queries.sampleQueries(data, 20, seed = 1)
    val hits = qs.count { q =>
      val ids = SparkPpq.strq(indexed, q.x, q.y, q.t, gc, data.bbox.x0, data.bbox.y0)
        .collect().map(_.getInt(0)).toSet
      (ids & Queries.groundTruth(data, q, gc)).nonEmpty
    }
    assert(hits.toDouble / qs.size >= 0.6, s"hit rate $hits/${qs.size}")
  }

  test("exact STRQ (candidates + raw join) equals ground truth for many queries") {
    val radius = math.sqrt(2.0) / 2.0 * params.gs.get
    for (q <- Queries.sampleQueries(data, 15, seed = 2)) {
      val ids = SparkPpq.strqExact(summary.toDF(), rawDf, q.x, q.y, q.t, gc,
        data.bbox.x0, data.bbox.y0, radius).collect().map(_.getInt(0)).toSet
      assert(ids == Queries.groundTruth(data, q, gc), s"query $q")
    }
  }

  test("exact STRQ matches the DuckDB oracle") {
    val q = Queries.sampleQueries(data, 1, seed = 3).head
    val radius = math.sqrt(2.0) / 2.0 * params.gs.get
    val ox = data.bbox.x0; val oy = data.bbox.y0
    val qx = math.floor((q.x - ox) / gc).toLong
    val qy = math.floor((q.y - oy) / gc).toLong
    val sparkDf = SparkPpq.strqExact(summary.toDF(), rawDf, q.x, q.y, q.t, gc, ox, oy, radius)
    Oracle.assertEquivalent(sparkDf,
      s"""SELECT DISTINCT traj_id FROM pts
          WHERE CAST(t AS INT) = ${q.t}
            AND floor((CAST(x AS DOUBLE) - ($ox)) / $gc) = $qx
            AND floor((CAST(y AS DOUBLE) - ($oy)) / $gc) = $qy""",
      "pts" -> rawDf)
  }

  test("TPQ returns the sub-trajectories of the candidate ids") {
    import spark.implicits._
    val q = Queries.sampleQueries(data, 1, seed = 4).head.copy(t = 5)
    val radius = math.sqrt(2.0) / 2.0 * params.gs.get
    val cands = SparkPpq.strqExact(summary.toDF(), rawDf, q.x, q.y, q.t, gc,
      data.bbox.x0, data.bbox.y0, radius)
    val l = 10
    val path = SparkPpq.tpq(summary.toDF(), cands, q.t, l).collect()
    val nCands = cands.count()
    assert(path.length == nCands * math.min(l, data.len - q.t))
    // every returned point is within the CQC bound of the raw position
    for (r <- path) {
      val id = r.getInt(0); val t = r.getInt(1)
      val d = Pt(r.getDouble(2), r.getDouble(3)).dist(data.point(id, t))
      assert(d <= math.sqrt(2.0) / 2.0 * params.gs.get + 1e-12)
    }
  }

  test("summary rows carry valid partition and codeword indices") {
    val rows = summary.collect()
    assert(rows.forall(_.b >= 0))
    assert(rows.forall(_.cqc_len > 0)) // CQC enabled in params
    assert(rows.map(_.group).distinct.length <= 4)
  }
}
