package repro.algos

import java.util.SplittableRandom
import repro.runtime._

/** Synthetic LA inputs for the end-to-end experiments — matrix-shaped
  * surrogates for the paper's datasets (see DESIGN.md "Substitutions"):
  * dense feature matrices for the scaled synthetic runs, `airlineLike`
  * (dense, 29 cols), `mnistLike` (sparse 0.25, 784 cols), and
  * `ratingsLike` (sparse/ultra-sparse ALS factorization inputs).
  * Deterministic in the seed.
  */
object AlgoData {

  def denseFeatures(n: Int, m: Int, seed: Long = 7): MatrixBlock =
    MatrixBlock.rand(n, m, 1.0, seed, min = -1.0, max = 1.0)

  def sparseFeatures(n: Int, m: Int, sparsity: Double, seed: Long = 7): MatrixBlock =
    MatrixBlock.rand(n, m, sparsity, seed, min = 0.0, max = 1.0)

  /** Airline78 surrogate: dense, 29 columns. */
  def airlineLike(n: Int, seed: Long = 11): MatrixBlock = denseFeatures(n, 29, seed)

  /** Mnist surrogate: sparse 0.25, 784 columns, values in (0, 1]. */
  def mnistLike(n: Int, seed: Long = 13): MatrixBlock = sparseFeatures(n, 784, 0.25, seed)

  /** Netflix/Amazon surrogate: (ultra-)sparse ratings in [1, 5]. */
  def ratingsLike(n: Int, m: Int, sparsity: Double, seed: Long = 17): MatrixBlock =
    MatrixBlock.rand(n, m, sparsity, seed, min = 1.0, max = 5.0)

  /** Two-class labels in {-1, +1} from a hidden linear model over X. */
  def labels2(x: MatrixBlock, seed: Long = 23): MatrixBlock = {
    val rng = new SplittableRandom(seed)
    val w = Array.fill(x.cols)(rng.nextDouble() * 2 - 1)
    MatrixBlock.tabulate(x.rows, 1) { (i, _) =>
      var s = rng.nextDouble() * 0.1 - 0.05
      var j = 0
      while (j < x.cols) { s += x.get(i, j) * w(j); j += 1 }
      if (s >= 0) 1.0 else -1.0
    }
  }

  /** One-hot labels over k classes (n x k), from a hidden linear model. */
  def labelsOneHot(x: MatrixBlock, k: Int, seed: Long = 29): MatrixBlock = {
    val rng = new SplittableRandom(seed)
    val w = Array.fill(k, x.cols)(rng.nextDouble() * 2 - 1)
    MatrixBlock.tabulate(x.rows, k) { (i, c) =>
      var best = 0; var bestV = Double.NegativeInfinity
      var cc = 0
      while (cc < k) {
        var s = 0.0
        var j = 0
        while (j < x.cols) { s += x.get(i, j) * w(cc)(j); j += 1 }
        if (s > bestV) { bestV = s; best = cc }
        cc += 1
      }
      if (c == best) 1.0 else 0.0
    }
  }
}

/** Result of an algorithm run: iterations executed and the final loss. */
final case class AlgoRun(name: String, iterations: Int, loss: Double,
                         extra: Map[String, Double] = Map.empty)
