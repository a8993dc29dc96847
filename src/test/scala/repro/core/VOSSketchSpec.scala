package repro.core

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.TestStreams
import repro.stream.EdgeEvent

class VOSSketchSpec extends AnyFunSuite {

  private val H = VOSHashes(k = 64, m = 4096, seed = 5)

  private def check(prop: Prop, min: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(min), prop)
    assert(res.passed, res.status.toString)
  }

  test("empty sketch: zero beta, no users") {
    val s = new VOSSketch(H)
    assert(s.beta == 0.0)
    assert(s.numUsers == 0)
    assert(s.cardinality(1L) == 0L)
  }

  test("single insert flips exactly one bit and bumps the counter") {
    val s = new VOSSketch(H)
    s.update(1L, 10L, insert = true)
    assert(s.array.onesCount == 1)
    assert(s.array.get(H.position(1L, 10L)) == 1)
    assert(s.cardinality(1L) == 1L)
  }

  test("insert then delete of the same edge cancels in the array") {
    val s = new VOSSketch(H)
    s.update(1L, 10L, insert = true)
    s.update(1L, 10L, insert = false)
    assert(s.array.onesCount == 0)
    assert(s.cardinality(1L) == 0L)
    assert(s.numUsers == 0)
  }

  test("counter tracks inserts minus deletes per user") {
    val s = new VOSSketch(H)
    Seq(10L, 11L, 12L).foreach(i => s.update(7L, i, insert = true))
    s.update(7L, 11L, insert = false)
    s.update(8L, 10L, insert = true)
    assert(s.cardinality(7L) == 2L)
    assert(s.cardinality(8L) == 1L)
    assert(s.numUsers == 2)
  }

  test("beta equals onesCount / m") {
    val s = new VOSSketch(H)
    (0L until 50L).foreach(i => s.update(i, i + 100, insert = true))
    assert(s.beta == s.array.onesCount.toDouble / H.m)
    assert(s.beta > 0)
  }

  test("update via EdgeEvent matches raw update") {
    val a = new VOSSketch(H)
    val b = new VOSSketch(H)
    a.update(EdgeEvent(3L, 4L, insert = true, 1L))
    b.update(3L, 4L, insert = true)
    assert(a.array == b.array && a.nU == b.nU)
  }

  test("array state is order-independent") {
    val events = TestStreams.random(20, 50, 400, seed = 11)
    val fwd = VOSSketch.build(H, events)
    val rev = VOSSketch.build(H, events.reverse) // infeasible order, same multiset
    assert(fwd.array == rev.array)
    assert(fwd.nU == rev.nU)
  }

  test("merge of partition partials equals sequential build") {
    val events = TestStreams.random(30, 60, 600, seed = 12)
    val seq    = VOSSketch.build(H, events)
    val parts  = events.grouped(137).map(VOSSketch.build(H, _)).toSeq
    val merged = parts.reduceLeft((a, b) => a.merge(b))
    assert(merged.array == seq.array)
    assert(merged.nU == seq.nU)
    assert(merged.beta == seq.beta)
  }

  test("merge rejects mismatched configs") {
    val a = new VOSSketch(VOSHashes(8, 64, 1))
    val b = new VOSSketch(VOSHashes(8, 64, 2))
    intercept[IllegalArgumentException](a.merge(b))
  }

  test("merge removes users whose counters cancel to zero") {
    val a = new VOSSketch(H); a.update(1L, 5L, insert = true)
    val b = new VOSSketch(H); b.update(1L, 5L, insert = false)
    a.merge(b)
    assert(a.numUsers == 0)
    assert(a.array.onesCount == 0)
  }

  test("rebuildOddSketch reads A at f_j(u)") {
    val s = new VOSSketch(H)
    s.update(9L, 3L, insert = true)
    val o = s.rebuildOddSketch(9L)
    assert(o.numBits == H.k)
    (0 until H.k).foreach(j => assert(o.get(j) == s.array.get(H.f(j, 9L))))
    assert(o.get(H.psi(3L)) == s.array.get(H.position(9L, 3L)))
  }

  test("alpha is symmetric and zero for identical virtual sketches") {
    val s = new VOSSketch(H)
    (0L until 30L).foreach(i => s.update(1L, i, insert = true))
    (0L until 30L).foreach(i => s.update(2L, i + 100, insert = true))
    assert(s.alpha(1L, 2L) == s.alpha(2L, 1L))
    assert(s.alpha(1L, 1L) == 0.0)
  }

  test("alpha equals hamming distance of rebuilt sketches / k") {
    val s = new VOSSketch(H)
    TestStreams.random(5, 40, 200, seed = 13).foreach(s.update)
    val o1 = s.rebuildOddSketch(0L)
    val o2 = s.rebuildOddSketch(1L)
    assert(s.alpha(0L, 1L) == o1.hammingDistance(o2).toDouble / H.k)
  }

  test("odd sketch parity: user's churned items leave its bits unchanged") {
    // With a private array (one user, huge m → no self-collision noise),
    // inserting and deleting churn items restores the exact array.
    val big = VOSHashes(k = 256, m = 1 << 20, seed = 21)
    val s1 = new VOSSketch(big)
    TestStreams.withChurn(1L, items = (0L until 40L), churn = (100L until 140L)).foreach(s1.update)
    val s2 = new VOSSketch(big)
    (0L until 40L).foreach(i => s2.update(1L, i, insert = true))
    assert(s1.array == s2.array)
    assert(s1.cardinality(1L) == s2.cardinality(1L))
  }

  test("copyOf is deep") {
    val s = new VOSSketch(H)
    s.update(1L, 2L, insert = true)
    val c = s.copyOf()
    c.update(3L, 4L, insert = true)
    assert(s.array != c.array)
    assert(s.cardinality(3L) == 0 && c.cardinality(3L) == 1)
  }

  test("estimate on disjoint large sets: s-hat near zero") {
    val cfg = VOSHashes(k = 2048, m = 1 << 20, seed = 31)
    val s = new VOSSketch(cfg)
    (0L until 100L).foreach(i => s.update(1L, i, insert = true))
    (200L until 300L).foreach(i => s.update(2L, i, insert = true))
    val est = s.estimate(1L, 2L)
    assert(math.abs(est.sRaw) < 15, s"sRaw=${est.sRaw} for disjoint sets")
    assert(est.s >= 0 && est.s <= 100)
  }

  test("estimate on identical sets: s-hat near the set size") {
    val cfg = VOSHashes(k = 2048, m = 1 << 20, seed = 32)
    val s = new VOSSketch(cfg)
    (0L until 100L).foreach { i =>
      s.update(1L, i, insert = true); s.update(2L, i, insert = true)
    }
    val est = s.estimate(1L, 2L)
    assert(math.abs(est.s - 100) < 15, s"s=${est.s} expected ~100")
    assert(est.jaccard > 0.8)
  }

  test("estimate accuracy on overlapping sets with deletions") {
    val cfg = VOSHashes(k = 4096, m = 1 << 21, seed = 33)
    val s = new VOSSketch(cfg)
    // u: {0..149}, v: {100..249}, overlap 50 — built with churn.
    (0L until 150L).foreach(i => s.update(1L, i, insert = true))
    (100L until 250L).foreach(i => s.update(2L, i, insert = true))
    // churn: add+remove 50 extra items on each
    (1000L until 1050L).foreach { i =>
      s.update(1L, i, insert = true); s.update(2L, i, insert = true)
    }
    (1000L until 1050L).foreach { i =>
      s.update(1L, i, insert = false); s.update(2L, i, insert = false)
    }
    val est = s.estimate(1L, 2L)
    assert(math.abs(est.s - 50) < 20, s"s=${est.s} expected ~50")
    val trueJ = 50.0 / 250.0
    assert(math.abs(est.jaccard - trueJ) < 0.1, s"J=${est.jaccard} expected ~$trueJ")
  }

  test("estimatePair returns (s, jaccard) of estimate") {
    val s = new VOSSketch(H)
    (0L until 10L).foreach(i => s.update(1L, i, insert = true))
    (0L until 10L).foreach(i => s.update(2L, i, insert = true))
    val (sHat, jHat) = s.estimatePair(1L, 2L)
    val est = s.estimate(1L, 2L)
    assert(sHat == est.s && jHat == est.jaccard)
  }

  test("paperConfig computes m = 32·k·|U| and k_vos = λ·32·k") {
    val h = VOSSketch.paperConfig(kBaseline = 100, numUsers = 50, lambda = 2, seed = 1)
    assert(h.m == 32 * 100 * 50)
    assert(h.k == 2 * 32 * 100)
  }

  test("paperConfig rejects bad arguments and overflow") {
    intercept[IllegalArgumentException](VOSSketch.paperConfig(0, 10))
    intercept[IllegalArgumentException](VOSSketch.paperConfig(10, 0))
    intercept[IllegalArgumentException](VOSSketch.paperConfig(100000, 1000000))
  }

  test("property: insert/delete churn always cancels in the array") {
    val gen = for {
      user  <- Gen.choose(0L, 5L)
      items <- Gen.nonEmptyListOf(Gen.choose(0L, 1000L)).map(_.distinct)
    } yield (user, items)
    check(Prop.forAll(gen) { case (u, items) =>
      val s = new VOSSketch(H)
      items.foreach(i => s.update(u, i, insert = true))
      items.foreach(i => s.update(u, i, insert = false))
      s.array.onesCount == 0 && s.numUsers == 0
    })
  }

  test("property: merge is commutative on the array and counters") {
    val ev = Gen.listOf(for {
      u <- Gen.choose(0L, 10L); i <- Gen.choose(0L, 50L); ins <- Gen.oneOf(true, false)
    } yield (u, i, ins))
    check(Prop.forAll(ev, ev) { (e1, e2) =>
      def mk(es: List[(Long, Long, Boolean)]) = {
        val s = new VOSSketch(H); es.foreach { case (u, i, a) => s.update(u, i, a) }; s
      }
      val ab = mk(e1).merge(mk(e2))
      val ba = mk(e2).merge(mk(e1))
      ab.array == ba.array && ab.nU == ba.nU
    }, min = 30)
  }
}
