package repro.jobs

import repro.eval.BenchTables
import repro.stream.DatasetSpec

/** spark-submit entrypoint reproducing Figure 2 (tables T1 and T2):
  * per-edge update time of VOS / MinHash / OPH / RP.
  *
  * Usage: `spark-submit --class repro.jobs.RuntimeJob repro.jar [kForT2]`
  * (runtime measurement is driver-side single-threaded, matching the
  * paper's per-edge update-cost experiment).
  */
object RuntimeJob {
  def main(args: Array[String]): Unit = {
    val kT2 = args.headOption.map(_.toInt).getOrElse(100000)
    val t1 = BenchTables.runtimeVsK()
    println(BenchTables.renderRuntimeVsK(
      t1, s"T1 (Fig 2a): ns/edge vs k, ${DatasetSpec.youtube.name}"))
    val t2 = BenchTables.runtimeAllDatasets(kT2)
    println(BenchTables.renderRuntimeAllDatasets(
      t2, s"T2 (Fig 2b): ns/edge at k=$kT2, all datasets"))
  }
}
