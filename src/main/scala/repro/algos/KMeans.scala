package repro.algos

import repro.core._
import repro.runtime._

/** Lloyd's k-means (SystemML `Kmeans`, Table 2: 1 run, k=5, 20 iterations).
  *
  * Per iteration: squared distances D = rowSums(X^2) - 2 X t(C) + t(rowSums(C^2)),
  * hard assignment A = (D == rowMins(D)), and centroid update
  * C = (t(A) %*% X) / t(colSums(A)). Distance and assignment chains are
  * Cell/Row-fusable; the paper's Table 4 shows the largest Gen speedups
  * on this algorithm.
  */
object KMeans {

  def run(ctx0: ExecContext, xData: MatrixData, k: Int = 5,
          maxIter: Int = 20, seed: Long = 31): AlgoRun = {
    implicit val ctx: ExecContext = ctx0
    val m = xData.cols.toInt
    val X = ctx.bind("X", xData)

    // deterministic random centroid init (independent of data placement so
    // local and distributed runs are comparable)
    var c: MatrixBlock = MatrixBlock.rand(k, m, 1.0, seed, min = -1.0, max = 1.0)

    var wcss = 0.0
    var iter = 0
    while (iter < maxIter) {
      val cB = ctx.bindLocal(s"C$iter", c)
      // D = -2 X t(C) + t(rowSums(C^2)); the rowSums(X^2) term is constant
      // w.r.t. the argmin and added only to the reported objective
      val dFixed = (X %*% cB.t) * -2.0 + ((cB ^ 2.0).rowSums).t
      val minD = dFixed.rowMins
      val a = dFixed.eqv(minD)
      val counts = a.colSums
      val cAgg = a.t %*% X
      val wcssExpr = minD.sum + (X ^ 2.0).sum
      val Seq(countsD, cAggD, wcssD) = ctx.eval(Seq(counts, cAgg, wcssExpr))
      val cnt = countsD.toLocal
      val cAggL = cAggD.toLocal
      wcss = wcssD.toLocal.get(0, 0)
      c = MatrixBlock.tabulate(k, m) { (i, j) =>
        val n = cnt.get(0, i)
        if (n > 0) cAggL.get(i, j) / n else c.get(i, j)
      }
      iter += 1
    }
    AlgoRun("KMeans", iter, wcss)
  }
}
