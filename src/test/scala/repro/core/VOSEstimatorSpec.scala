package repro.core

import org.scalatest.funsuite.AnyFunSuite

class VOSEstimatorSpec extends AnyFunSuite {

  test("estimateNDelta inverts expectedAlpha exactly (beta = 0)") {
    val k = 1000
    for (nDelta <- Seq(0L, 1L, 10L, 100L, 400L)) {
      val alpha = VOSEstimator.expectedAlpha(k, nDelta, 0.0)
      val back  = VOSEstimator.estimateNDelta(k, alpha, 0.0)
      // exp(-2n/k) vs (1-2/k)^n differ slightly; tolerance scales with n.
      assert(math.abs(back - nDelta) <= math.max(1.0, 0.01 * nDelta),
        s"nDelta=$nDelta back=$back")
    }
  }

  test("estimateNDelta inverts expectedAlpha under contamination beta > 0") {
    val k = 2000
    for (beta <- Seq(0.01, 0.05, 0.1); nDelta <- Seq(0L, 50L, 300L)) {
      val alpha = VOSEstimator.expectedAlpha(k, nDelta, beta)
      val back  = VOSEstimator.estimateNDelta(k, alpha, beta)
      assert(math.abs(back - nDelta) <= math.max(1.5, 0.02 * nDelta),
        s"beta=$beta nDelta=$nDelta back=$back")
    }
  }

  test("estimateNDelta at alpha = 0 and beta = 0 is 0") {
    assert(VOSEstimator.estimateNDelta(100, 0.0, 0.0) == 0.0)
  }

  test("estimateNDelta is monotone increasing in alpha (below saturation)") {
    val vals = Seq(0.0, 0.1, 0.2, 0.3, 0.4, 0.45).map(a => VOSEstimator.estimateNDelta(500, a, 0.02))
    vals.sliding(2).foreach { case Seq(a, b) => assert(a < b) ; case _ => () }
  }

  test("alpha at saturation (1/2) does not produce infinity") {
    val n = VOSEstimator.estimateNDelta(100, 0.5, 0.0)
    assert(!n.isInfinite && !n.isNaN)
  }

  test("beta at 1/2 does not produce infinity") {
    val n = VOSEstimator.estimateNDelta(100, 0.25, 0.5)
    assert(!n.isInfinite && !n.isNaN)
  }

  test("argument validation") {
    intercept[IllegalArgumentException](VOSEstimator.estimateNDelta(0, 0.1, 0.1))
    intercept[IllegalArgumentException](VOSEstimator.estimateNDelta(10, -0.1, 0.1))
    intercept[IllegalArgumentException](VOSEstimator.estimateNDelta(10, 0.1, 1.5))
    intercept[IllegalArgumentException](VOSEstimator.estimate(10, 0.1, 0.1, -1, 5))
  }

  test("estimate: identical sets (alpha = 0) give s = n and J = 1") {
    val e = VOSEstimator.estimate(1000, 0.0, 0.0, 50, 50)
    assert(e.s == 50.0)
    assert(e.jaccard == 1.0)
  }

  test("estimate: disjoint sets give s ≈ 0") {
    val k = 4000
    val nDelta = 100L // nu = nv = 50, s = 0
    val alpha = VOSEstimator.expectedAlpha(k, nDelta, 0.0)
    val e = VOSEstimator.estimate(k, alpha, 0.0, 50, 50)
    assert(math.abs(e.sRaw) < 2, s"sRaw=${e.sRaw}")
    assert(e.jaccard < 0.05)
  }

  test("estimate: overlap recovered from expected alpha") {
    val k = 8000
    val (nu, nv, s) = (200L, 150L, 70L)
    val nDelta = nu + nv - 2 * s
    val alpha = VOSEstimator.expectedAlpha(k, nDelta, 0.03)
    val e = VOSEstimator.estimate(k, alpha, 0.03, nu, nv)
    assert(math.abs(e.s - s) < 3, s"s=${e.s} expected $s")
    val trueJ = s.toDouble / (nu + nv - s)
    assert(math.abs(e.jaccard - trueJ) < 0.02)
  }

  test("estimate clamps s into [0, min(nu, nv)]") {
    // alpha near 1/2 → huge n̂_Δ → negative sRaw → clamped to 0.
    val e1 = VOSEstimator.estimate(100, 0.49, 0.0, 10, 20)
    assert(e1.s == 0.0 && e1.sRaw < 0)
    // alpha = 0 with unequal sets → sRaw = (nu+nv)/2 > min → clamped.
    val e2 = VOSEstimator.estimate(100, 0.0, 0.0, 10, 100)
    assert(e2.s == 10.0 && e2.sRaw == 55.0)
  }

  test("estimate with zero cardinalities") {
    val e = VOSEstimator.estimate(100, 0.0, 0.0, 0, 0)
    assert(e.s == 0.0 && e.jaccard == 0.0)
  }

  test("jaccard stays in [0, 1]") {
    for (alpha <- Seq(0.0, 0.1, 0.3, 0.49); nu <- Seq(0L, 5L, 50L); nv <- Seq(0L, 5L, 50L)) {
      val e = VOSEstimator.estimate(200, alpha, 0.05, nu, nv)
      assert(e.jaccard >= 0.0 && e.jaccard <= 1.0, s"J=${e.jaccard}")
    }
  }

  test("expectedAlpha properties") {
    assert(VOSEstimator.expectedAlpha(100, 0, 0.0) == 0.0)
    // Grows with nDelta toward 1/2.
    val a1 = VOSEstimator.expectedAlpha(100, 10, 0.0)
    val a2 = VOSEstimator.expectedAlpha(100, 50, 0.0)
    assert(a1 < a2 && a2 < 0.5)
    // Contamination raises the baseline: at nDelta=0, alpha = 2β(1−β).
    val b = 0.1
    assert(math.abs(VOSEstimator.expectedAlpha(100, 0, b) - 2 * b * (1 - b)) < 1e-12)
  }

  test("expectedSHat approaches s for beta = 0 and nDelta << k") {
    val k = 10000
    val e = VOSEstimator.expectedSHat(k, nDelta = 100, beta = 0.0, s = 40)
    // bias term: 1/8 − e^{4·100/k}/8 ≈ 0 for nDelta << k.
    assert(math.abs(e - 40) < 0.1, s"E[s-hat]=$e")
  }

  test("varianceSHat is positive and grows with nDelta") {
    val k = 1000
    val v1 = VOSEstimator.varianceSHat(k, 10, 0.01)
    val v2 = VOSEstimator.varianceSHat(k, 400, 0.01)
    assert(v1 > 0 && v2 > v1, s"v1=$v1 v2=$v2")
  }

  test("varianceSHat grows with beta") {
    val v1 = VOSEstimator.varianceSHat(1000, 100, 0.01)
    val v2 = VOSEstimator.varianceSHat(1000, 100, 0.10)
    assert(v2 > v1)
  }

  test("monte carlo: empirical mean of s-hat within predicted bias band") {
    // Build many independent odd sketches of the same pair, estimate, and
    // compare the empirical mean against the paper's E(ŝ) approximation.
    val k = 512
    val (nu, nv, s) = (60L, 60L, 20L)
    val nDelta = (nu + nv - 2 * s).toInt
    val trials = 300
    val rng = new java.util.SplittableRandom(77)
    var sum = 0.0
    (0 until trials).foreach { _ =>
      // Direct odd sketches (beta = 0): XOR of nDelta random register hits.
      val o = new BitArray(k)
      (0 until nDelta).foreach(_ => o.flip(rng.nextInt(k)))
      val alpha = o.onesCount.toDouble / k
      sum += VOSEstimator.estimate(k, alpha, 0.0, nu, nv).sRaw
    }
    val mean = sum / trials
    val predicted = VOSEstimator.expectedSHat(k, nDelta, 0.0, s.toDouble)
    val sd = math.sqrt(math.max(VOSEstimator.varianceSHat(k, nDelta, 0.0), 1.0))
    assert(math.abs(mean - predicted) < 4 * sd / math.sqrt(trials.toDouble) + 1.0,
      s"empirical mean $mean vs predicted $predicted (sd=$sd)")
  }
}
