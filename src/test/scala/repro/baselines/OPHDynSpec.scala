package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestStreams
import repro.stream.EdgeEvent

class OPHDynSpec extends AnyFunSuite {

  private def insertAll(o: OPHDyn, u: Long, items: Seq[Long]): Unit =
    items.zipWithIndex.foreach { case (i, t) => o.update(EdgeEvent(u, i, insert = true, t + 1L)) }

  test("rejects non-positive k") {
    intercept[IllegalArgumentException](new OPHDyn(0))
  }

  test("bin is stable and in range") {
    val o = new OPHDyn(16, seed = 2)
    (0L until 2000L).foreach { i =>
      val b = o.bin(i)
      assert(b >= 0 && b < 16)
      assert(b == o.bin(i))
    }
  }

  test("bins are roughly balanced") {
    val o = new OPHDyn(8, seed = 3)
    val counts = (0L until 8000L).map(o.bin).groupBy(identity).view.mapValues(_.size)
    counts.values.foreach(c => assert(c > 700 && c < 1300, s"bin load $c"))
  }

  test("register keeps the min-hash item of its bin") {
    val o = new OPHDyn(8, seed = 4)
    val items = 0L until 200L
    insertAll(o, 1L, items)
    val r = o.registers(1L)
    (0 until 8).foreach { j =>
      val inBin = items.filter(i => o.bin(i) == j)
      if (inBin.nonEmpty) {
        val expect = inBin.minBy(o.h)(
          Ordering.fromLessThan((a, b) => java.lang.Long.compareUnsigned(a, b) < 0))
        assert(r(j) == expect, s"bin $j")
      } else assert(r(j) == o.Empty)
    }
  }

  test("update touches only the item's own bin") {
    val o = new OPHDyn(16, seed = 5)
    insertAll(o, 1L, 0L until 50L)
    val before = o.registers(1L).clone()
    val item = 500L
    val j = o.bin(item)
    o.update(EdgeEvent(1L, item, insert = true, 100L))
    val after = o.registers(1L)
    (0 until 16).foreach(b => if (b != j) assert(after(b) == before(b)))
  }

  test("deleting the stored item empties its bin; others unaffected") {
    val o = new OPHDyn(8, seed = 6)
    insertAll(o, 1L, 0L until 50L)
    val r = o.registers(1L)
    val j = r.indexWhere(_ != o.Empty)
    val victim = r(j)
    o.update(EdgeEvent(1L, victim, insert = false, 100L))
    assert(o.registers(1L)(j) == o.Empty)
  }

  test("deleting a non-stored item is a no-op on registers (the bias)") {
    val o = new OPHDyn(4, seed = 7)
    insertAll(o, 1L, 0L until 40L)
    val before = o.registers(1L).clone()
    val notStored = (0L until 40L).find(i => !before.contains(i)).get
    o.update(EdgeEvent(1L, notStored, insert = false, 100L))
    assert(o.registers(1L).sameElements(before))
  }

  test("static sets: estimated jaccard close to true jaccard") {
    val o = new OPHDyn(512, seed = 8)
    insertAll(o, 1L, 0L until 300L)
    insertAll(o, 2L, 150L until 450L)
    val (_, jHat) = o.estimatePair(1L, 2L) // true J = 150/450 = 1/3
    assert(math.abs(jHat - 1.0 / 3) < 0.08, s"jHat=$jHat")
  }

  test("identical sets estimate jaccard 1") {
    val o = new OPHDyn(64, seed = 9)
    insertAll(o, 1L, 0L until 100L)
    insertAll(o, 2L, 0L until 100L)
    assert(o.estimatePair(1L, 2L)._2 == 1.0)
  }

  test("disjoint sets estimate jaccard ~0") {
    val o = new OPHDyn(256, seed = 10)
    insertAll(o, 1L, 0L until 100L)
    insertAll(o, 2L, 10000L until 10100L)
    assert(o.estimatePair(1L, 2L)._2 < 0.03)
  }

  test("estimator denominator counts only jointly-nonempty-union bins") {
    val o = new OPHDyn(1024, seed = 11)
    insertAll(o, 1L, 0L until 5L)
    insertAll(o, 2L, 0L until 5L)
    // Only ≤5 bins occupied out of 1024; identical small sets must still
    // estimate J = 1 because empty-empty bins are excluded.
    assert(o.estimatePair(1L, 2L)._2 == 1.0)
  }

  test("deletion bias: churn depresses the estimate (paper § III)") {
    val o = new OPHDyn(256, seed = 12)
    TestStreams.withChurn(1L, items = 0L until 50L, churn = 100L until 200L).foreach(o.update)
    insertAll(o, 2L, 0L until 50L)
    val (_, jHat) = o.estimatePair(1L, 2L) // true J = 1
    assert(jHat < 0.8, s"expected depressed estimate, got $jHat")
  }

  test("estimate for unseen users is zero") {
    val o = new OPHDyn(8)
    assert(o.estimatePair(1L, 2L) == ((0.0, 0.0)))
  }

  test("counters track cardinality through churn") {
    val o = new OPHDyn(8)
    TestStreams.withChurn(3L, items = 0L until 7L, churn = 50L until 60L).foreach(o.update)
    assert(o.cardinality(3L) == 7)
  }
}
