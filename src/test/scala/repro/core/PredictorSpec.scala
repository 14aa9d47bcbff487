package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PredictorSpec extends AnyFunSuite {

  test("solve: identity system") {
    val x = Predictor.solve(Array(Array(1.0, 0.0), Array(0.0, 1.0)), Array(3.0, 4.0))
    assert(math.abs(x(0) - 3.0) < 1e-9 && math.abs(x(1) - 4.0) < 1e-9)
  }

  test("solve: requires pivoting") {
    // first pivot is zero — partial pivoting must swap rows
    val x = Predictor.solve(Array(Array(0.0, 1.0), Array(2.0, 0.0)), Array(5.0, 6.0))
    assert(math.abs(x(0) - 3.0) < 1e-9 && math.abs(x(1) - 5.0) < 1e-9)
  }

  for (seed <- 0 until 10)
    test(s"solve: random well-conditioned system (seed=$seed)") {
      val rng = new Random(seed)
      val n = 2 + rng.nextInt(4)
      val a = Array.fill(n, n)(rng.nextDouble() * 2 - 1)
      for (i <- 0 until n) a(i)(i) += n // diagonally dominant
      val xTrue = Array.fill(n)(rng.nextDouble() * 4 - 2)
      val b = Array.tabulate(n)(i => (0 until n).map(j => a(i)(j) * xTrue(j)).sum)
      val x = Predictor.solve(a.map(_.clone), b.clone)
      for (i <- 0 until n) assert(math.abs(x(i) - xTrue(i)) < 1e-8)
    }

  test("fit recovers exact linear recurrence coefficients") {
    // T^t = 1.7·T^{t-1} − 0.7·T^{t-2} (constant-velocity extrapolation mix)
    val c0 = 1.7; val c1 = -0.7
    val rng = new Random(1)
    val hist = Array.fill(40)(Array(Pt(rng.nextDouble() * 10, rng.nextDouble() * 10),
                                    Pt(rng.nextDouble() * 10, rng.nextDouble() * 10)))
    val target = hist.map(h => h(0) * c0 + h(1) * c1)
    val p = Predictor.fit(hist, target, 2)
    assert(math.abs(p(0) - c0) < 1e-5, s"got ${p.toSeq}")
    assert(math.abs(p(1) - c1) < 1e-5)
  }

  test("fit minimises residual vs perturbed coefficients") {
    val rng = new Random(2)
    val hist = Array.fill(60)(Array(Pt(rng.nextDouble(), rng.nextDouble()), Pt(rng.nextDouble(), rng.nextDouble())))
    val target = hist.map(h => h(0) * 1.2 + h(1) * -0.1 + Pt(rng.nextGaussian() * 0.01, rng.nextGaussian() * 0.01))
    val p = Predictor.fit(hist, target, 2)
    def loss(c: Array[Double]): Double =
      hist.indices.map(i => target(i).dist(Predictor.predict(c, hist(i)))).map(d => d * d).sum
    val best = loss(p)
    for (d <- Seq(0.05, -0.05)) {
      assert(best <= loss(Array(p(0) + d, p(1))) + 1e-12)
      assert(best <= loss(Array(p(0), p(1) + d)) + 1e-12)
    }
  }

  test("predict is linear in history") {
    val h = Array(Pt(1, 2), Pt(3, 4))
    assert(Predictor.predict(Array(2.0, -1.0), h) == Pt(-1.0, 0.0))
  }

  test("arFeatures returns zeros for short series") {
    assert(Predictor.arFeatures(IndexedSeq(Pt(0, 0), Pt(1, 1)), 2, 10).toSeq == Seq(0.0, 0.0))
  }

  test("arFeatures recovers the AR process of one trajectory") {
    // positions follow x_t = 1.9 x_{t-1} - 0.9 x_{t-2} (smooth motion)
    var a = Pt(0.0, 0.0); var b = Pt(1.0, 0.5)
    val series = scala.collection.mutable.ArrayBuffer(a, b)
    for (_ <- 0 until 30) { val c = b * 1.9 + a * -0.9; series += c; a = b; b = c }
    val f = Predictor.arFeatures(series.toIndexedSeq, 2, 20)
    assert(math.abs(f(0) - 1.9) < 1e-4, s"got ${f.toSeq}")
    assert(math.abs(f(1) + 0.9) < 1e-4)
  }

  test("arFeatures of constant series predicts the constant") {
    val series = IndexedSeq.fill(20)(Pt(5.0, 5.0))
    val f = Predictor.arFeatures(series, 2, 10)
    val pred = Predictor.predict(f, Array(Pt(5, 5), Pt(5, 5)))
    assert(pred.dist(Pt(5, 5)) < 1e-6)
  }
}
