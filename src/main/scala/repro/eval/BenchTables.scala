package repro.eval

import repro.baselines.{MinHashDyn, OPHDyn, RandomPairing}
import repro.core.{SimilaritySketch, VOSHashes, VOSSketch}
import repro.eval.RuntimeMeasure.RuntimeRow
import repro.stream.{DatasetSpec, DynamicStreamGen, GraphGen}

/** Producers for the evaluation tables T1–T6 (DESIGN.md § 6) — the
  * numbers behind the paper's Figures 2 and 3. Shared between the
  * `bench/` suites and the `jobs/` spark-submit entrypoints so both print
  * identical rows.
  */
object BenchTables {

  /** k sweep of Figure 2(a). */
  val RuntimeKs: Seq[Int] = Seq(1, 10, 100, 1000, 10000, 100000)

  /** The shared-array size used for runtime rows only: update cost is
    * independent of m, and the paper's m = 32·k·|U| at k = 10⁵ would not
    * fit an `Int`-addressed array; 2²⁶ bits keeps allocation trivial.
    */
  private val RuntimeM = 1 << 26

  private def freshMethod(method: String, k: Int, seed: Long): (SimilaritySketch, Long) =
    method match {
      // (sketch, register visits per edge) — the latter only budgets the
      // timed prefix length in RuntimeMeasure.
      case "VOS"     => (new VOSSketch(VOSHashes(64 * k, RuntimeM, seed)), 1L)
      case "OPH"     => (new OPHDyn(k, seed), 1L)
      case "MinHash" => (new MinHashDyn(k, seed), k.toLong)
      case "RP"      => (new RandomPairing(k, seed), k.toLong)
      case other     => throw new IllegalArgumentException(s"unknown method $other")
    }

  val MethodNames: Seq[String] = Seq("VOS", "MinHash", "OPH", "RP")

  /** T1 (Fig 2a): ns/edge vs k on one dataset, all methods. */
  def runtimeVsK(spec: DatasetSpec = DatasetSpec.youtube,
                 ks: Seq[Int] = RuntimeKs,
                 seed: Long = 42L): Seq[RuntimeRow] = {
    val stream = DynamicStreamGen.generate(GraphGen.baseEdges(spec), seed = seed)
    for {
      k      <- ks
      method <- MethodNames
    } yield {
      val (sketch, ops) = freshMethod(method, k, seed)
      RuntimeMeasure.measure(sketch, stream, k, ops)
    }
  }

  /** T2 (Fig 2b): ns/edge at one k for every dataset, all methods. */
  def runtimeAllDatasets(k: Int = 100000,
                         specs: Seq[DatasetSpec] = DatasetSpec.all,
                         seed: Long = 42L): Seq[(String, RuntimeRow)] =
    for {
      spec   <- specs
      stream  = DynamicStreamGen.generate(GraphGen.baseEdges(spec), seed = seed)
      method <- MethodNames
    } yield {
      val (sketch, ops) = freshMethod(method, k, seed)
      (spec.name, RuntimeMeasure.measure(sketch, stream, k, ops))
    }

  /** T3+T4 (Fig 3a/3c): accuracy over time on one dataset. */
  def accuracyOverTime(spec: DatasetSpec = DatasetSpec.youtube,
                       cfg: EvalConfig = EvalConfig()): Seq[AccuracyRow] =
    Harness.evaluate(spec, cfg)

  /** T5+T6 (Fig 3b/3d): end-of-stream accuracy on every dataset. */
  def accuracyAllDatasets(specs: Seq[DatasetSpec] = DatasetSpec.all,
                          cfg: EvalConfig = EvalConfig()): Seq[AccuracyRow] =
    specs.flatMap { spec =>
      val rows = Harness.evaluate(spec, cfg)
      val last = rows.map(_.checkpoint).max
      rows.filter(_.checkpoint == last)
    }

  // ---- rendering ----

  def renderRuntimeVsK(rows: Seq[RuntimeRow], title: String): String = {
    val byK = rows.groupBy(_.k).toSeq.sortBy(_._1)
    TableFmt.render(
      title,
      "k" +: MethodNames.map(m => s"$m ns/edge"),
      byK.map { case (k, rs) =>
        k.toString +: MethodNames.map(m =>
          TableFmt.fmt(rs.find(_.method == m).map(_.nsPerEdge).getOrElse(Double.NaN)))
      },
    )
  }

  def renderRuntimeAllDatasets(rows: Seq[(String, RuntimeRow)], title: String): String = {
    val byDs = rows.groupBy(_._1)
    val order = rows.map(_._1).distinct
    TableFmt.render(
      title,
      "dataset" +: MethodNames.map(m => s"$m ns/edge"),
      order.map { ds =>
        ds +: MethodNames.map(m =>
          TableFmt.fmt(byDs(ds).map(_._2).find(_.method == m).map(_.nsPerEdge).getOrElse(Double.NaN)))
      },
    )
  }

  def renderAccuracyOverTime(rows: Seq[AccuracyRow], metric: String, title: String): String = {
    val methods = rows.map(_.method).distinct
    val byCp    = rows.groupBy(_.checkpoint).toSeq.sortBy(_._1)
    def value(r: AccuracyRow): Double = if (metric == "AAPE") r.aape else r.armse
    TableFmt.render(
      title,
      Seq("checkpoint", "t") ++ methods.map(m => s"$m $metric"),
      byCp.map { case (cp, rs) =>
        Seq(cp.toString, rs.head.time.toString) ++
          methods.map(m => TableFmt.fmt(rs.find(_.method == m).map(value).getOrElse(Double.NaN)))
      },
    )
  }

  def renderAccuracyAllDatasets(rows: Seq[AccuracyRow], metric: String, title: String): String = {
    val methods = rows.map(_.method).distinct
    val order   = rows.map(_.dataset).distinct
    def value(r: AccuracyRow): Double = if (metric == "AAPE") r.aape else r.armse
    TableFmt.render(
      title,
      "dataset" +: methods.map(m => s"$m $metric"),
      order.map { ds =>
        ds +: methods.map(m =>
          TableFmt.fmt(rows.find(r => r.dataset == ds && r.method == m).map(value).getOrElse(Double.NaN)))
      },
    )
  }
}
