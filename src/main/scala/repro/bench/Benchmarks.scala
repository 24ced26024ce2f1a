package repro.bench

import org.apache.spark.sql.SparkSession
import repro.algos._
import repro.compiler._
import repro.core._
import repro.dist.DistOps
import repro.runtime._

/** Benchmark harnesses reproducing the paper's evaluation tables (3-6).
  *
  * Scales are reduced vs the paper (single `local[*]` node, single-threaded
  * kernels); EXPERIMENTS.md records the paper's numbers next to ours.
  * Each harness prints the same row structure the paper reports.
  */
object Benchmarks {

  val Modes: Seq[ExecMode] =
    Seq(BaseMode, FusedMode, GenMode(CostBased), GenMode(FuseAll), GenMode(FuseNoRedundancy))

  def timeS[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  private def fmt(v: Option[Double]): String = v.map(s => f"$s%8.2f").getOrElse("     N/A")

  // ------------------------------------------------------------- Table 3

  final case class CompileRow(name: String, totalS: Double, dags: Long, cplans: Long,
                              compiled: Long, codegenMs: Double, compileMs: Double,
                              cacheHits: Long)

  /** Table 3: end-to-end compilation overhead (Gen defaults) on a small
    * Mnist-like input. */
  def table3(n: Int = 6000): Seq[CompileRow] = {
    val x = AlgoData.mnistLike(n)
    val y2 = AlgoData.labels2(x)
    val y01 = MatrixBlock.tabulate(n, 1)((i, _) => if (y2.get(i, 0) > 0) 1.0 else 0.0)
    val yMulti = AlgoData.labelsOneHot(x, 3)
    val ratings = AlgoData.ratingsLike(800, 600, 0.05)

    def gen = new ExecContext(GenMode(CostBased))
    val algos: Seq[(String, () => AlgoRun)] = Seq(
      "L2SVM"       -> (() => L2SVM.run(gen, LocalData(x), LocalData(y2), maxIter = 10)),
      "MLogreg"     -> (() => MLogreg.run(gen, LocalData(x), LocalData(yMulti), maxIter = 5, innerIter = 5)),
      "GLM"         -> (() => GLM.run(gen, LocalData(x), LocalData(y01), maxIter = 5, innerIter = 5)),
      "KMeans"      -> (() => KMeans.run(gen, LocalData(x), k = 5, maxIter = 10)),
      "ALS-CG"      -> (() => ALSCG.run(gen, LocalData(ratings), rank = 20, outerIter = 3, cgIter = 3)),
      "AutoEncoder" -> (() => AutoEncoder.run(gen, LocalData(AlgoData.denseFeatures(4096, 128)),
                              h1 = 64, h2 = 2, batch = 512)),
    )
    algos.map { case (name, run) =>
      Codegen.clearCache()
      Selector.clearSelectionCache()
      CodegenStats.reset()
      val (_, t) = timeS(run())
      CompileRow(name, t,
        CodegenStats.dagsOptimized.get(), CodegenStats.cplansConstructed.get(),
        CodegenStats.operatorsCompiled.get(),
        CodegenStats.codegenNanos.get() / 1e6, CodegenStats.compileNanos.get() / 1e6,
        CodegenStats.planCacheHits.get())
    }
  }

  def printTable3(rows: Seq[CompileRow]): String = {
    val sb = new StringBuilder
    sb.append("Table 3: End-to-End Compilation Overhead (Gen defaults)\n")
    sb.append(f"${"Name"}%-12s ${"Total[s]"}%9s ${"#DAGs"}%7s ${"#CPlans"}%8s ${"#Compile"}%9s ${"Codegen[ms]"}%12s ${"Compile[ms]"}%12s ${"CacheHits"}%10s\n")
    rows.foreach { r =>
      sb.append(f"${r.name}%-12s ${r.totalS}%9.2f ${r.dags}%7d ${r.cplans}%8d ${r.compiled}%9d ${r.codegenMs}%12.1f ${r.compileMs}%12.1f ${r.cacheHits}%10d\n")
    }
    sb.toString
  }

  // --------------------------------------------------------- Tables 4-6

  final case class RuntimeRow(algo: String, data: String,
                              times: Seq[(String, Option[Double])])

  def printRuntimeTable(title: String, rows: Seq[RuntimeRow]): String = {
    val sb = new StringBuilder
    sb.append(title).append("\n")
    val labels = rows.head.times.map(_._1)
    sb.append(f"${"Name"}%-12s ${"Data"}%-16s").append(labels.map(l => f"$l%9s").mkString).append("\n")
    rows.foreach { r =>
      sb.append(f"${r.algo}%-12s ${r.data}%-16s")
        .append(r.times.map(t => s" ${fmt(t._2)}").mkString).append("\n")
    }
    sb.toString
  }

  /** Run one algorithm under every mode; `skip(label)` marks modes N/A
    * (paper Table 5: Base/FA/FNR infeasible for large sparse ALS). Losses
    * across modes are checked to agree (results, not just runtimes).
    * `warm` runs once before timing (JIT + operator compilation; plan and
    * selection caches stay warm, like a long-running SystemML instance —
    * Table 3 isolates the compilation overhead separately). */
  private def runAllModes(run: ExecContext => AlgoRun,
                          mkCtx: ExecMode => ExecContext,
                          skip: String => Boolean = _ => false,
                          warm: ExecContext => Unit = _ => ()): Seq[(String, Option[Double])] = {
    var refLoss = Option.empty[Double]
    Modes.map { mode =>
      val label = mode.label
      if (skip(label)) label -> None
      else {
        warm(mkCtx(mode))
        val (res, t) = timeS(run(mkCtx(mode)))
        refLoss match {
          case Some(l) =>
            require(math.abs(res.loss - l) <= 1e-4 * math.max(1.0, math.abs(l)),
              s"$label loss ${res.loss} deviates from $l")
          case None => refLoss = Some(res.loss)
        }
        label -> Some(t)
      }
    }
  }

  /** Table 4: data-intensive algorithms, single node. */
  def table4(scale: Int = 1): Seq[RuntimeRow] = {
    val sizes = Seq(
      ("10^4 x 10", () => AlgoData.denseFeatures(10_000 * scale, 10)),
      ("10^5 x 10", () => AlgoData.denseFeatures(100_000 * scale, 10)),
      ("10^6 x 10", () => AlgoData.denseFeatures(1_000_000 * scale, 10)),
      ("AirlineLike", () => AlgoData.airlineLike(200_000 * scale)),
      ("MnistLike", () => AlgoData.mnistLike(20_000 * scale)),
    )
    val local = (m: ExecMode) => new ExecContext(m)
    sizes.flatMap { case (label, mk) =>
      val x = mk()
      val y2 = AlgoData.labels2(x)
      val y01 = MatrixBlock.tabulate(x.rows, 1)((i, _) => if (y2.get(i, 0) > 0) 1.0 else 0.0)
      val yM = AlgoData.labelsOneHot(x, 3)
      val nw = math.min(x.rows, 2000)
      val xw = LocalOps.rowSlice(x, 0, nw)
      val y2w = LocalOps.rowSlice(y2, 0, nw); val y01w = LocalOps.rowSlice(y01, 0, nw)
      val yMw = LocalOps.rowSlice(yM, 0, nw)
      Seq(
        RuntimeRow("L2SVM", label,
          runAllModes(c => L2SVM.run(c, LocalData(x), LocalData(y2), maxIter = 5, maxInnerIter = 10), local,
            warm = c => L2SVM.run(c, LocalData(xw), LocalData(y2w), maxIter = 2, maxInnerIter = 3))),
        RuntimeRow("MLogreg", label,
          runAllModes(c => MLogreg.run(c, LocalData(x), LocalData(yM), maxIter = 3, innerIter = 4), local,
            warm = c => MLogreg.run(c, LocalData(xw), LocalData(yMw), maxIter = 1, innerIter = 2))),
        RuntimeRow("GLM", label,
          runAllModes(c => GLM.run(c, LocalData(x), LocalData(y01), maxIter = 3, innerIter = 5), local,
            warm = c => GLM.run(c, LocalData(xw), LocalData(y01w), maxIter = 1, innerIter = 2))),
        RuntimeRow("KMeans", label,
          runAllModes(c => KMeans.run(c, LocalData(x), k = 5, maxIter = 5), local,
            warm = c => KMeans.run(c, LocalData(xw), k = 5, maxIter = 1))),
      )
    }
  }

  /** Table 5: compute-intensive algorithms (ALS-CG sparse, AutoEncoder dense). */
  def table5(scale: Int = 1): Seq[RuntimeRow] = {
    val local = (m: ExecMode) => new ExecContext(m)
    // Base/FA/FNR materialize the dense n x m intermediate: infeasible
    // beyond ~3e7 cells on this box (paper: "N/A")
    def naAbove(cells: Long)(label: String): Boolean =
      cells > 20_000_000L && (label == "Base" || label == "Gen-FA" || label == "Gen-FNR")

    val alsSizes = Seq(
      ("10^3 x 10^3",   1_000 * scale,  1_000 * scale, 0.01),
      ("3k x 3k",       3_000 * scale,  3_000 * scale, 0.01),
      ("10^4 x 10^4",  10_000 * scale, 10_000 * scale, 0.01),
      ("NetflixLike",   8_000 * scale,  4_000 * scale, 0.012),
      ("AmazonLike",   40_000 * scale, 20_000 * scale, 0.00012),
    )
    val alsWarm = AlgoData.ratingsLike(400, 300, 0.05)
    val als = alsSizes.map { case (label, n, m, sp) =>
      val x = AlgoData.ratingsLike(n, m, sp)
      RuntimeRow("ALS-CG", label,
        runAllModes(c => ALSCG.run(c, LocalData(x), rank = 20, outerIter = 2, cgIter = 2),
          local, naAbove(n.toLong * m),
          warm = c => ALSCG.run(c, LocalData(alsWarm), rank = 20, outerIter = 1, cgIter = 1)))
    }
    val aeSizes = Seq(
      ("10^3 x 128", 1_000 * scale),
      ("4k x 128",   4_096 * scale),
      ("16k x 128", 16_384 * scale),
    )
    val ae = aeSizes.map { case (label, n) =>
      val x = AlgoData.denseFeatures(n, 128)
      RuntimeRow("AutoEncoder", label,
        runAllModes(c => AutoEncoder.run(c, LocalData(x), h1 = 64, h2 = 2, batch = 512), local,
          // warm on the same data for a few batches: covers both DAG
          // signatures (zero and non-zero bias sparsity)
          warm = c => AutoEncoder.run(c, LocalData(x), h1 = 64, h2 = 2, batch = 512, maxBatches = 3)))
    }
    als ++ ae
  }

  /** Table 6: distributed algorithms (X as Dataset[BlockRow] on Spark). */
  def table6(spark: SparkSession, scale: Int = 1): Seq[RuntimeRow] = {
    val blockSize = 4096
    val datasets = Seq(
      ("D-like dense", () => AlgoData.denseFeatures(50_000 * scale, 100)),
      ("S-like sparse", () => AlgoData.sparseFeatures(40_000 * scale, 500, 0.05)),
      ("MnistLike", () => AlgoData.mnistLike(20_000 * scale)),
    )
    // X stays distributed; intermediates above ~1 MB go distributed too
    val cfg = CostConfig(localMemBudget = 1L << 20)
    def mkCtx(m: ExecMode) = new ExecContext(m, cfg, Some(spark), blockSize)

    datasets.flatMap { case (label, mk) =>
      val x = mk()
      val y2 = AlgoData.labels2(x)
      val y01 = MatrixBlock.tabulate(x.rows, 1)((i, _) => if (y2.get(i, 0) > 0) 1.0 else 0.0)
      val yM = AlgoData.labelsOneHot(x, 3)
      def dx = DistData(DistOps.fromLocal(spark, x, blockSize))
      val nw = math.min(x.rows, 2000)
      val xw = LocalOps.rowSlice(x, 0, nw)
      val y2w = LocalOps.rowSlice(y2, 0, nw); val y01w = LocalOps.rowSlice(y01, 0, nw)
      val yMw = LocalOps.rowSlice(yM, 0, nw)
      def dxw = DistData(DistOps.fromLocal(spark, xw, blockSize))
      Seq(
        RuntimeRow("L2SVM", label,
          runAllModes(c => L2SVM.run(c, dx, LocalData(y2), maxIter = 3, maxInnerIter = 5), mkCtx,
            warm = c => L2SVM.run(c, dxw, LocalData(y2w), maxIter = 1, maxInnerIter = 2))),
        RuntimeRow("MLogreg", label,
          runAllModes(c => MLogreg.run(c, dx, LocalData(yM), maxIter = 2, innerIter = 3), mkCtx,
            warm = c => MLogreg.run(c, dxw, LocalData(yMw), maxIter = 1, innerIter = 1))),
        RuntimeRow("GLM", label,
          runAllModes(c => GLM.run(c, dx, LocalData(y01), maxIter = 2, innerIter = 3), mkCtx,
            warm = c => GLM.run(c, dxw, LocalData(y01w), maxIter = 1, innerIter = 1))),
        RuntimeRow("KMeans", label,
          runAllModes(c => KMeans.run(c, dx, k = 5, maxIter = 3), mkCtx,
            warm = c => KMeans.run(c, dxw, k = 5, maxIter = 1))),
      )
    }
  }
}
