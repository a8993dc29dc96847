package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.BenchTables
import repro.stream.DatasetSpec

/** T1 + T2 (paper Figure 2): per-edge update time.
  *
  * Paper claims reproduced here: VOS and OPH update in O(1) — flat in k —
  * while MinHash and RP visit all k registers per edge and slow down
  * linearly, becoming orders of magnitude slower at k = 10⁵.
  */
class RuntimeBenchSuite extends AnyFunSuite {

  private lazy val t1 = BenchTables.runtimeVsK()

  private def ns(method: String, k: Int): Double =
    t1.find(r => r.method == method && r.k == k).get.nsPerEdge

  test("T1 (Fig 2a): runtime vs k on youtube-lite") {
    println(BenchTables.renderRuntimeVsK(
      t1, s"T1 (Fig 2a): ns/edge vs k, ${DatasetSpec.youtube.name}"))
    assert(t1.size == BenchTables.RuntimeKs.size * 4)
    assert(t1.forall(_.nsPerEdge > 0))
  }

  test("T1 shape: VOS and OPH are flat in k (O(1) per edge)") {
    assert(ns("VOS", 100000) < 20 * ns("VOS", 1),
      s"VOS not flat: ${ns("VOS", 1)} -> ${ns("VOS", 100000)} ns/edge")
    assert(ns("OPH", 100000) < 20 * ns("OPH", 1),
      s"OPH not flat: ${ns("OPH", 1)} -> ${ns("OPH", 100000)} ns/edge")
  }

  test("T1 shape: MinHash and RP grow linearly in k (O(k) per edge)") {
    assert(ns("MinHash", 100000) > 100 * ns("MinHash", 1),
      s"MinHash k=1e5 ${ns("MinHash", 100000)} vs k=1 ${ns("MinHash", 1)}")
    assert(ns("RP", 100000) > 100 * ns("RP", 1),
      s"RP k=1e5 ${ns("RP", 100000)} vs k=1 ${ns("RP", 1)}")
  }

  test("T1 shape: at k = 1e5, VOS is orders of magnitude faster than MinHash/RP") {
    assert(ns("MinHash", 100000) > 100 * ns("VOS", 100000))
    assert(ns("RP", 100000) > 100 * ns("VOS", 100000))
  }

  test("T2 (Fig 2b): runtime at k = 1e5 on all datasets") {
    val t2 = BenchTables.runtimeAllDatasets(100000)
    println(BenchTables.renderRuntimeAllDatasets(
      t2, "T2 (Fig 2b): ns/edge at k=100000, all datasets"))
    assert(t2.size == 4 * 4)
    DatasetSpec.all.map(_.name).foreach { ds =>
      def of(m: String) = t2.find(r => r._1 == ds && r._2.method == m).get._2.nsPerEdge
      assert(of("MinHash") > 50 * of("VOS"), s"$ds: MinHash ${of("MinHash")} vs VOS ${of("VOS")}")
      assert(of("RP") > 50 * of("VOS"), s"$ds: RP ${of("RP")} vs VOS ${of("VOS")}")
      assert(of("OPH") < 50 * of("VOS"), s"$ds: OPH ${of("OPH")} should be same order as VOS ${of("VOS")}")
    }
  }
}
