package repro.eval

import repro.core.SimilaritySketch
import repro.stream.EdgeEvent

/** Per-edge update-time measurement behind the paper's Figure 2 (tables
  * T1/T2 in DESIGN.md § 6).
  *
  * The paper measures "the runtime during which we implement all four
  * methods respectively to update the sketch for each user". We report
  * nanoseconds per edge over a prefix of the stream; the prefix shrinks
  * for O(k) methods at large k (`budget ≈ maxEdges·k` register visits) so
  * the sweep to k = 10⁵ stays minutes-scale — ns/edge is a per-edge rate
  * and does not depend on the prefix length. A warmup prefix is processed
  * first (JIT).
  */
object RuntimeMeasure {

  /** One runtime measurement row. */
  final case class RuntimeRow(method: String, k: Int, nsPerEdge: Double, edges: Int)

  /** Measure ns/edge for `sketch` over a prefix of `events`.
    *
    * @param opsPerEdge 1 for O(1) methods (VOS, OPH), k for O(k) methods
    *                   (MinHash, RP) — used only to pick the prefix length
    * @param maxEdges   prefix cap for O(1) methods
    */
  def measure(
      sketch: SimilaritySketch,
      events: IndexedSeq[EdgeEvent],
      k: Int,
      opsPerEdge: Long,
      maxEdges: Int = 200000,
      warmup: Int = 2000,
  ): RuntimeRow = {
    require(opsPerEdge > 0, s"opsPerEdge must be positive: $opsPerEdge")
    // Keep total register visits bounded: ~1e8 visits ≈ well under a second.
    val budgetEdges = math.max(500L, 100000000L / opsPerEdge)
    val nEdges = math.min(math.min(maxEdges.toLong, budgetEdges), events.length.toLong).toInt

    // Warmup shrinks with the measured prefix so O(k) methods at k = 10⁵
    // don't spend (and allocate) more in warmup than in measurement.
    val w = math.min(math.max(100, nEdges / 2), math.min(warmup, events.length))
    var i = 0
    while (i < w) { sketch.update(events(i)); i += 1 }

    // Time the measured prefix (replayed from the start of the remaining
    // stream; sketches accept any feasible sequence).
    val start = math.min(w, events.length - nEdges)
    val t0 = System.nanoTime()
    i = 0
    while (i < nEdges) { sketch.update(events(start + i)); i += 1 }
    val t1 = System.nanoTime()
    RuntimeRow(sketch.name, k, (t1 - t0).toDouble / nEdges, nEdges)
  }
}
