package repro.stream

import scala.collection.mutable

/** Specification of one synthetic bipartite dataset (a laptop-scale analog
  * of the paper's YouTube / Flickr / Orkut / LiveJournal crawls — see
  * DESIGN.md § 5 for the substitution rationale).
  *
  * @param name       dataset label used in tables
  * @param numUsers   |U|
  * @param numItems   |I|
  * @param baseEdges  target number of distinct (user, item) base edges
  * @param alphaUser  Zipf exponent of user degrees (larger = more skew)
  * @param alphaItem  Zipf exponent of item popularity
  * @param seed       generation seed
  */
final case class DatasetSpec(
    name: String,
    numUsers: Int,
    numItems: Int,
    baseEdges: Int,
    alphaUser: Double,
    alphaItem: Double,
    seed: Long,
) {
  require(numUsers > 0 && numItems > 0 && baseEdges > 0, s"bad sizes in $this")
}

object DatasetSpec {
  /** The four dataset analogs, ordered as the paper lists them.
    *
    * User-degree exponents are sub-linear (α < 1) so the *top few hundred*
    * users all carry large item sets — the paper tracks the 5000
    * largest-cardinality users of million-node crawls, whose sets (and
    * pairwise overlaps) are large; a steeper Zipf at this scale would
    * leave most tracked users with near-empty sets and put every method
    * in a regime the paper never evaluates.
    */
  val youtube: DatasetSpec =
    DatasetSpec("youtube-lite", 4000, 8000, 400000, 0.70, 1.10, 101L)
  val flickr: DatasetSpec =
    DatasetSpec("flickr-lite", 3000, 6000, 350000, 0.75, 1.05, 102L)
  val orkut: DatasetSpec =
    DatasetSpec("orkut-lite", 2000, 4000, 400000, 0.60, 1.00, 103L)
  val livejournal: DatasetSpec =
    DatasetSpec("livejournal-lite", 5000, 10000, 400000, 0.80, 1.15, 104L)

  val all: Seq[DatasetSpec] = Seq(youtube, flickr, orkut, livejournal)

  /** Uniformly shrink a spec (for unit tests / smoke benches). */
  def scaled(spec: DatasetSpec, factor: Double): DatasetSpec = {
    require(factor > 0 && factor <= 1, s"factor out of (0,1]: $factor")
    spec.copy(
      numUsers  = math.max(10, (spec.numUsers * factor).toInt),
      numItems  = math.max(20, (spec.numItems * factor).toInt),
      baseEdges = math.max(50, (spec.baseEdges * factor).toInt),
    )
  }
}

/** Synthetic bipartite power-law graph generator.
  *
  * User degrees follow a rank-Zipf law (user of rank r gets weight
  * `1/r^alphaUser`, scaled so total degree ≈ `baseEdges`); each user then
  * picks that many *distinct* items from a Zipf popularity distribution
  * over items. The result is deterministic in the spec (including seed).
  *
  * Heavy-tailed degrees give a small set of very-large users (the paper
  * tracks the top-cardinality users) and popular items shared by many
  * users (so tracked pairs have non-trivial intersections).
  */
object GraphGen {

  /** Zipf sampler over ranks 1..n with exponent alpha, via inverse CDF. */
  final class ZipfSampler(n: Int, alpha: Double, rng: java.util.SplittableRandom) {
    require(n > 0, s"n must be positive, got $n")
    private val cdf = {
      val w = Array.tabulate(n)(r => 1.0 / math.pow(r + 1.0, alpha))
      var acc = 0.0
      val c = new Array[Double](n)
      var i = 0
      while (i < n) { acc += w(i); c(i) = acc; i += 1 }
      val tot = acc
      i = 0
      while (i < n) { c(i) /= tot; i += 1 }
      c
    }

    /** Draw a 0-based rank. */
    def next(): Int = {
      val u = rng.nextDouble()
      val idx = java.util.Arrays.binarySearch(cdf, u)
      val pos = if (idx >= 0) idx else -idx - 1
      math.min(pos, n - 1)
    }
  }

  /** Generate the distinct base edge set of `spec`, as (user, item) pairs.
    * Users are ids `0 until numUsers` with rank = id (user 0 is the
    * largest); items are ids `0 until numItems` with a random popularity
    * permutation so item id does not encode popularity.
    */
  def baseEdges(spec: DatasetSpec): IndexedSeq[(Long, Long)] = {
    val rng = new java.util.SplittableRandom(spec.seed)

    // Per-user target degrees: rank-Zipf scaled to baseEdges total.
    val rawW  = Array.tabulate(spec.numUsers)(r => 1.0 / math.pow(r + 1.0, spec.alphaUser))
    val wSum  = rawW.sum
    val maxDeg = math.max(1, spec.numItems / 2)
    val degrees = rawW.map { w =>
      math.min(maxDeg, math.max(1, math.round(w / wSum * spec.baseEdges).toInt))
    }

    // Item popularity: Zipf over a shuffled id permutation.
    val itemPerm = {
      val a = Array.tabulate(spec.numItems)(identity)
      var i = a.length - 1
      while (i > 0) { val j = rng.nextInt(i + 1); val t = a(i); a(i) = a(j); a(j) = t; i -= 1 }
      a
    }
    val itemZipf = new ZipfSampler(spec.numItems, spec.alphaItem, rng)

    val edges = IndexedSeq.newBuilder[(Long, Long)]
    var u = 0
    while (u < spec.numUsers) {
      val want = degrees(u)
      val chosen = new mutable.HashSet[Int]
      var attempts = 0
      // Distinct items per user; bail after enough misses so very skewed
      // popularity cannot loop forever.
      val maxAttempts = want * 30 + 100
      while (chosen.size < want && attempts < maxAttempts) {
        chosen.add(itemPerm(itemZipf.next()))
        attempts += 1
      }
      chosen.foreach(i => edges += ((u.toLong, i.toLong)))
      u += 1
    }
    edges.result()
  }
}
