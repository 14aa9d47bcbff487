package repro.core

import scala.collection.mutable

/** Partitioning for grouped modelling (§3.2.1): grow the number of
  * partitions q round by round until every member is within ε_p of its
  * centroid (Eq. 7 for spatial features, Eq. 8 for autocorrelation
  * features — the caller chooses the feature vectors). */
object Partitioner {

  final case class Result(assign: Array[Int], centroids: Array[Array[Double]], rounds: Int)

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  def maxDeviation(vecs: Array[Array[Double]], assign: Array[Int], cents: Array[Array[Double]]): Double = {
    var m = 0.0
    var i = 0
    while (i < vecs.length) { val d = dist(vecs(i), cents(assign(i))); if (d > m) m = d; i += 1 }
    m
  }

  /** q starts at 1 and grows by `a` per round (Lemma 1's schedule) until the
    * ε_p constraint holds; q = n always satisfies it, so the loop terminates. */
  def partitionByThreshold(vecs: Array[Array[Double]], epsP: Double, a: Int = 4,
                           maxRounds: Int = 64, seed: Long = 11): Result = {
    if (vecs.isEmpty) return Result(Array.empty, Array.empty, 0)
    var q = 1
    var round = 1
    var (cents, assign) = KMeans.cluster(vecs, q, seed = seed)
    while (round < maxRounds && q < vecs.length && maxDeviation(vecs, assign, cents) > epsP) {
      q = math.min(vecs.length, q + a)
      round += 1
      val r = KMeans.cluster(vecs, q, seed = seed + round)
      cents = r._1; assign = r._2
    }
    Result(assign, cents, round)
  }
}

/** Incremental temporal partitioning (§3.2.2). Partition ids are stable
  * across timestamps: points keep their previous partition; partitions
  * violating ε_p are re-partitioned from scratch over their own members;
  * partitions whose centroids come within ε_p are merged, each at most
  * once per update (the paper's fragmentation guard). */
final class IncrementalPartitioner(epsP: Double, growth: Int = 4, seed: Long = 13) {
  private val assignOf = mutable.HashMap.empty[Int, Int]   // trajId -> partition id
  private var centroidOf = Map.empty[Int, Array[Double]]   // partition id -> centroid
  private var nextPart = 0
  var splits = 0
  var merges = 0
  private var round = 0

  def numPartitions: Int = centroidOf.size

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0
    var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  private def centroid(vecs: Seq[Array[Double]]): Array[Double] = {
    val dim = vecs.head.length
    val c = new Array[Double](dim)
    vecs.foreach { v => var i = 0; while (i < dim) { c(i) += v(i); i += 1 } }
    var i = 0
    while (i < dim) { c(i) /= vecs.length; i += 1 }
    c
  }

  /** Assign each (id, vec) to a partition; returns partition ids aligned
    * with the input order. */
  def update(ids: Array[Int], vecs: Array[Array[Double]]): Array[Int] = {
    round += 1
    require(ids.length == vecs.length)
    if (ids.isEmpty) return Array.empty
    // Step 1: carry over previous assignments; new trajectories join the
    // nearest existing partition (or seed the first one).
    val members = mutable.LinkedHashMap.empty[Int, mutable.ArrayBuffer[Int]] // part -> input idx
    var i = 0
    while (i < ids.length) {
      val prev = assignOf.get(ids(i)).filter(centroidOf.contains)
      val part = prev.getOrElse {
        if (centroidOf.isEmpty) { val p = nextPart; nextPart += 1; centroidOf += p -> vecs(i).clone; p }
        else centroidOf.minBy { case (_, c) => dist(vecs(i), c) }._1
      }
      members.getOrElseUpdate(part, mutable.ArrayBuffer.empty) += i
      i += 1
    }
    // Step 2: recompute centroids; re-partition any group violating ε_p.
    val rebuilt = mutable.LinkedHashMap.empty[Int, mutable.ArrayBuffer[Int]]
    for ((part, idxs) <- members) {
      val vs = idxs.map(vecs(_)).toArray
      val c = centroid(vs.toSeq)
      val worst = vs.map(dist(_, c)).max
      if (worst <= epsP) {
        centroidOf += part -> c
        rebuilt.getOrElseUpdate(part, mutable.ArrayBuffer.empty) ++= idxs
      } else {
        val r = Partitioner.partitionByThreshold(vs, epsP, growth, seed = seed + round)
        val localParts = r.assign.distinct
        splits += localParts.length - 1
        val remap = localParts.map { lp =>
          val np = nextPart; nextPart += 1
          lp -> np
        }.toMap
        centroidOf -= part
        for ((lp, p) <- remap) centroidOf += p -> r.centroids(lp)
        var j = 0
        while (j < idxs.length) {
          rebuilt.getOrElseUpdate(remap(r.assign(j)), mutable.ArrayBuffer.empty) += idxs(j)
          j += 1
        }
      }
    }
    // Step 3: merge centroids within ε_p, each partition at most once.
    val alive = rebuilt.keys.toArray
    val merged = mutable.HashSet.empty[Int]
    var a = 0
    while (a < alive.length) {
      if (!merged.contains(alive(a))) {
        var b = a + 1
        var done = false
        while (b < alive.length && !done) {
          if (!merged.contains(alive(b)) &&
              dist(centroidOf(alive(a)), centroidOf(alive(b))) <= epsP) {
            rebuilt(alive(a)) ++= rebuilt(alive(b))
            rebuilt -= alive(b)
            centroidOf -= alive(b)
            centroidOf += alive(a) -> centroid(rebuilt(alive(a)).map(vecs(_)).toSeq)
            merged += alive(a); merged += alive(b)
            merges += 1
            done = true // this partition has merged once already
          }
          b += 1
        }
      }
      a += 1
    }
    // Commit assignments.
    val out = new Array[Int](ids.length)
    for ((part, idxs) <- rebuilt; idx <- idxs) {
      out(idx) = part
      assignOf(ids(idx)) = part
    }
    // Drop centroids with no current members so they don't attract strays.
    centroidOf = centroidOf.filter { case (p, _) => rebuilt.contains(p) }
    out
  }
}
