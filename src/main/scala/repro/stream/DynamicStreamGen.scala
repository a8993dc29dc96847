package repro.stream

/** Fully dynamic graph stream generator.
  *
  * Converts a static base edge set into a feasible stream of subscriptions
  * and unsubscriptions (DESIGN.md § 5 documents how this substitutes for
  * the Trièst-style q/d model at repro scale):
  *
  *   - every base edge is inserted exactly once;
  *   - with probability `d` (paper: d = 0.5) a matching deletion is
  *     scheduled after the insertion;
  *   - a deleted edge is re-inserted with probability `r` (= 0.5),
  *     modeling re-subscription.
  *
  * Each edge's 1–3 actions get i.i.d. uniform virtual timestamps sorted
  * ascending within the edge, and the whole stream is ordered by
  * timestamp: deletions are interleaved uniformly through the stream and
  * feasibility (insert before delete before re-insert, no duplicates)
  * holds by construction. Expected stream length is `(1 + d + d·r)·|E|`
  * and the expected deletion fraction `d/(1 + d + d·r)` (≈ 28.6% at
  * d = r = 0.5).
  */
object DynamicStreamGen {

  /** Generate the event stream for `edges`.
    *
    * @param edges distinct base (user, item) pairs
    * @param d     probability an inserted edge is later deleted
    * @param r     probability a deleted edge is re-inserted
    * @param seed  scheduling seed
    */
  def generate(
      edges: IndexedSeq[(Long, Long)],
      d: Double = 0.5,
      r: Double = 0.5,
      seed: Long = 1234L,
  ): IndexedSeq[EdgeEvent] = {
    require(d >= 0 && d <= 1, s"d out of [0,1]: $d")
    require(r >= 0 && r <= 1, s"r out of [0,1]: $r")
    val rng = new java.util.SplittableRandom(seed)

    // (virtual timestamp, user, item, insert?)
    val actions = IndexedSeq.newBuilder[(Double, Long, Long, Boolean)]
    edges.foreach { case (u, i) =>
      val nActs =
        if (rng.nextDouble() >= d) 1
        else if (rng.nextDouble() >= r) 2
        else 3
      val ts = Array.fill(nActs)(rng.nextDouble())
      java.util.Arrays.sort(ts)
      var a = 0
      while (a < nActs) {
        actions += ((ts(a), u, i, a % 2 == 0)) // ins, del, ins, ...
        a += 1
      }
    }

    actions
      .result()
      .sortBy(_._1)
      .zipWithIndex
      .map { case ((_, u, i, ins), idx) => EdgeEvent(u, i, ins, idx + 1L) }
  }

  /** Check stream feasibility (insert only absent, delete only present).
    * Returns the number of events checked; throws on the first violation.
    */
  def assertFeasible(stream: IterableOnce[EdgeEvent]): Long = {
    val present = scala.collection.mutable.HashSet.empty[(Long, Long)]
    var n = 0L
    stream.iterator.foreach { e =>
      val key = (e.user, e.item)
      if (e.insert)
        require(present.add(key), s"duplicate insert $key at t=${e.time}")
      else
        require(present.remove(key), s"delete of absent $key at t=${e.time}")
      n += 1
    }
    n
  }
}
