package repro.jobs

import repro.algos._
import repro.compiler._
import repro.core._
import repro.runtime._

/** Ad-hoc profiling entry point (not part of the benchmark tables). */
object DebugJob {
  def main(args: Array[String]): Unit = {
    val xb = AlgoData.ratingsLike(40000, 20000, 0.00012)
    implicit val ctx: ExecContext = new ExecContext(GenMode(CostBased))
    val X = ctx.bindLocal("X", xb)
    val u = ctx.bindLocal("U", MatrixBlock.rand(40000, 20, 1.0, 1).toDense)
    val v = ctx.bindLocal("V", MatrixBlock.rand(20000, 20, 1.0, 2).toDense)
    val gradU = ((X.neq0 * (u %*% v.t)) %*% v) - (X %*% v) + u * 1e-3
    val gradV = ((X.neq0 * (u %*% v.t)).t %*% u) - (X.t %*% u) + v * 1e-3
    val loss = (((X.neq0 * (u %*% v.t)) - X) ^ 2.0).sum
    for ((n, e) <- Seq("gradU" -> gradU, "gradV" -> gradV, "loss" -> loss)) {
      println(s"=== $n ===")
      println(ctx.compilePlan(Seq(e.hop)))
      val t0 = System.nanoTime()
      ctx.eval(Seq(e))
      val t1 = System.nanoTime()
      ctx.eval(Seq(e))
      println(f"first=${(t1-t0)/1e9}%.2f s warm=${(System.nanoTime()-t1)/1e9}%.2f s")
    }
  }
}
