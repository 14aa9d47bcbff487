package repro.query

import repro.SparkSpec
import repro.Oracle
import repro.core._
import repro.data.TrajGen
import scala.util.Random

class QueriesSpec extends SparkSpec {

  private lazy val data = TrajGen.portoLike(60, 30, seed = 31)
  private val gc = Geo.toDegrees(100.0)

  /** Identity reconstruction: recon == raw. */
  private lazy val identity: Map[(Int, Int), Pt] =
    (for (t <- 1 to data.len; i <- 0 until data.numTrajs) yield ((i, t), data.point(i, t))).toMap

  test("MAE of the identity reconstruction is zero") {
    assert(Queries.maeMeters(identity, data) == 0.0)
  }

  test("MAE of a shifted reconstruction equals the shift") {
    val shifted = identity.map { case (k, p) => k -> Pt(p.x + Geo.toDegrees(50.0), p.y) }
    assert(math.abs(Queries.maeMeters(shifted, data) - 50.0) < 1e-6)
  }

  test("ground truth contains the queried trajectory itself") {
    for (q <- Queries.sampleQueries(data, 50, seed = 1)) {
      val truth = Queries.groundTruth(data, q, gc)
      assert(truth.nonEmpty)
    }
  }

  test("approxByCell on identity reconstruction equals ground truth") {
    for (q <- Queries.sampleQueries(data, 50, seed = 2)) {
      assert(Queries.approxByCell(identity, data, q, gc) == Queries.groundTruth(data, q, gc))
    }
  }

  test("precision/recall of a perfect answer is (1,1)") {
    assert(Queries.precisionRecall(Set(1, 2), Set(1, 2)) == ((1.0, 1.0)))
    assert(Queries.precisionRecall(Set.empty, Set.empty) == ((1.0, 1.0)))
  }

  test("precision/recall of partial answers") {
    val (p, r) = Queries.precisionRecall(Set(1, 2, 3, 4), Set(1, 2))
    assert(p == 0.5 && r == 1.0)
    val (p2, r2) = Queries.precisionRecall(Set(1), Set(1, 2))
    assert(p2 == 1.0 && r2 == 0.5)
  }

  test("local search + refine recovers full recall on bounded perturbations") {
    val rng = new Random(3)
    val radius = math.sqrt(2.0) / 2.0 * Geo.toDegrees(50.0)
    // perturb every reconstruction within the CQC bound
    val perturbed = identity.map { case (k, p) =>
      val ang = rng.nextDouble() * 2 * math.Pi
      val rad = rng.nextDouble() * radius
      k -> Pt(p.x + rad * math.cos(ang), p.y + rad * math.sin(ang))
    }
    for (q <- Queries.sampleQueries(data, 80, seed = 4)) {
      val truth = Queries.groundTruth(data, q, gc)
      val cands = Queries.localSearchCandidates(perturbed, data, q, gc, radius)
      assert(truth.subsetOf(cands), s"missed ${truth -- cands}")
      val refined = Queries.refineWithRaw(cands, data, q, gc)
      val (p, r) = Queries.precisionRecall(refined, truth)
      assert(p == 1.0 && r == 1.0)
    }
  }

  test("without local search, bounded perturbations lose recall at cell borders") {
    val rng = new Random(5)
    val radius = Geo.toDegrees(60.0)
    val perturbed = identity.map { case (k, p) =>
      val ang = rng.nextDouble() * 2 * math.Pi
      k -> Pt(p.x + radius * math.cos(ang), p.y + radius * math.sin(ang))
    }
    val recalls = Queries.sampleQueries(data, 100, seed = 6).map { q =>
      Queries.precisionRecall(Queries.approxByCell(perturbed, data, q, gc),
        Queries.groundTruth(data, q, gc))._2
    }
    assert(recalls.sum / recalls.size < 1.0)
  }

  test("tpqMae of identity is zero, of shifted is the shift") {
    assert(Queries.tpqMae(identity, data, 20, 10, seed = 7) == 0.0)
    val shifted = identity.map { case (k, p) => k -> Pt(p.x, p.y + Geo.toDegrees(30.0)) }
    assert(math.abs(Queries.tpqMae(shifted, data, 20, 10, seed = 7) - 30.0) < 1e-6)
  }

  test("visitedRatio grows with radius and is within [0,1]") {
    val qs = Queries.sampleQueries(data, 30, seed = 8)
    val small = Queries.visitedRatio(identity, data, qs, Geo.toDegrees(10.0))
    val large = Queries.visitedRatio(identity, data, qs, Geo.toDegrees(2000.0))
    assert(small >= 0.0 && large <= 1.0)
    assert(small <= large)
    assert(small > 0.0) // the queried trajectory itself is within any radius
  }

  test("maxDeviationDeg of identity is zero") {
    assert(Queries.maxDeviationDeg(identity, data) == 0.0)
  }

  // --- Oracle-checked DataFrame ground truth: the STRQ cell predicate is
  // the same in Spark SQL and DuckDB (guards the query semantics the
  // distributed layer relies on). ---
  test("STRQ ground truth via DataFrame matches DuckDB oracle") {
    import spark.implicits._
    val small = TrajGen.portoLike(40, 10, seed = 32)
    val rawDf = small.allPoints.map { case (id, t, p) => (id, t, p.x, p.y) }
      .toSeq.toDF("traj_id", "t", "x", "y")
    val q = Queries.sampleQueries(small, 1, seed = 9).head
    val ox = small.bbox.x0; val oy = small.bbox.y0
    val qx = math.floor((q.x - ox) / gc).toLong
    val qy = math.floor((q.y - oy) / gc).toLong
    val sparkDf = rawDf.filter(
      org.apache.spark.sql.functions.col("t") === q.t &&
      org.apache.spark.sql.functions.floor((org.apache.spark.sql.functions.col("x") - ox) / gc) === qx &&
      org.apache.spark.sql.functions.floor((org.apache.spark.sql.functions.col("y") - oy) / gc) === qy)
      .select(org.apache.spark.sql.functions.col("traj_id"))
    Oracle.assertEquivalent(sparkDf,
      s"""SELECT traj_id FROM pts
          WHERE CAST(t AS INT) = ${q.t}
            AND floor((CAST(x AS DOUBLE) - ($ox)) / $gc) = $qx
            AND floor((CAST(y AS DOUBLE) - ($oy)) / $gc) = $qy""",
      "pts" -> rawDf)
    // and the in-memory ground truth agrees with the DataFrame
    val dfIds = sparkDf.collect().map(_.getInt(0)).toSet
    assert(dfIds == Queries.groundTruth(small, q, gc))
  }
}
