package repro.eval

/** The paper's two accuracy metrics (§ V).
  *
  * AAPE (average absolute percentage error) scores the common-item
  * estimate ŝ; ARMSE (average root mean square error) scores the Jaccard
  * estimate Ĵ. Both average over the tracked pair set P at one time t.
  */
object Metrics {

  /** AAPE = (1/|P|)·Σ |s − ŝ|/s over pairs with s > 0.
    *
    * The paper's formula divides by the true s; pairs whose intersection
    * is momentarily empty at a checkpoint (possible mid-stream even though
    * selection requires a common item in the final sets) are excluded for
    * that checkpoint — the per-pair term is undefined at s = 0.
    *
    * @param pairs (trueS, estimatedS) per tracked pair
    * @return (aape, pairsUsed)
    */
  def aape(pairs: Iterable[(Double, Double)]): (Double, Int) = {
    var sum  = 0.0
    var used = 0
    pairs.foreach { case (s, sHat) =>
      if (s > 0) { sum += math.abs((s - sHat) / s); used += 1 }
    }
    (if (used == 0) 0.0 else sum / used, used)
  }

  /** ARMSE = sqrt( (1/|P|)·Σ (Ĵ − J)² ) over all tracked pairs. */
  def armse(pairs: Iterable[(Double, Double)]): Double = {
    var sum = 0.0
    var n   = 0
    pairs.foreach { case (j, jHat) =>
      val d = jHat - j
      sum += d * d
      n += 1
    }
    if (n == 0) 0.0 else math.sqrt(sum / n)
  }
}
