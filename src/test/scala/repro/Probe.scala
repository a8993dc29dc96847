package repro

import repro.eval.{EvalConfig, Harness}
import repro.stream.DatasetSpec

/** Ad-hoc parameter probe (test scope, not a test): prints final-checkpoint
  * AAPE/ARMSE per method for a few configs to pick robust unit-test
  * settings. Run: `sbt "Test/runMain repro.Probe"`.
  */
object Probe {
  def main(args: Array[String]): Unit = {
    for {
      scale <- Seq(0.05, 0.1, 0.2)
      k     <- Seq(32, 64)
      d     <- Seq(0.5, 0.9)
    } {
      val spec = DatasetSpec.scaled(DatasetSpec.youtube, scale)
      val cfg  = EvalConfig(kBaseline = k, topUsers = 30, maxPairs = 60, checkpoints = 2, d = d, r = d)
      val t0 = System.nanoTime()
      val rows = Harness.evaluate(spec, cfg)
      val last = rows.filter(_.checkpoint == 2)
      val ms = (System.nanoTime() - t0) / 1000000
      val txt = last.map(r => f"${r.method}%-8s aape=${r.aape}%.3f armse=${r.armse}%.3f").mkString("  ")
      println(f"scale=$scale%-4s k=$k%-3d d=$d%-3s [$ms%5d ms] $txt")
    }
  }
}
