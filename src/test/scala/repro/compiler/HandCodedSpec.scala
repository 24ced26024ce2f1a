package repro.compiler

import repro.SparkSpec
import repro.core._
import repro.runtime._

/** The "Fused" baseline: pattern matching of hand-coded fused operators
  * and correctness of their kernels. */
class HandCodedSpec extends SparkSpec {

  private def fusedCtx = new ExecContext(FusedMode)
  private def dense(r: Int, c: Int, s: Long = 1) = MatrixBlock.rand(r, c, 1.0, s, min = -1, max = 1)
  private def sparse(r: Int, c: Int, s: Long = 2) = MatrixBlock.rand(r, c, 0.1, s, min = -1, max = 1)

  private def kinds(plan: ExecPlan): Seq[HandKind] =
    plan.ops.collect { case PHandCoded(k, _, _, _) => k }

  test("pattern: mmchain t(X)(Xv) matched") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(40, 8))
    val v = c.bindLocal("v", dense(8, 1, 3))
    assert(kinds(c.compilePlan(Seq((x.t %*% (x %*% v)).hop))) == Seq(MMChainXtXv))
  }
  test("pattern: weighted mmchain matched (both multiply orders)") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(40, 8))
    val v = c.bindLocal("v", dense(8, 1, 3))
    val w = c.bindLocal("w", dense(40, 1, 4))
    assert(kinds(c.compilePlan(Seq((x.t %*% (w * (x %*% v))).hop))) == Seq(MMChainXtwXv))
    assert(kinds(c.compilePlan(Seq((x.t %*% ((x %*% v) * w)).hop))) == Seq(MMChainXtwXv))
  }
  test("pattern: sum(X^2) and sum(X*Y) matched") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(40, 8))
    val y = c.bindLocal("Y", dense(40, 8, 5))
    assert(kinds(c.compilePlan(Seq((x ^ 2.0).sum.hop))) == Seq(HSumSq))
    assert(kinds(c.compilePlan(Seq((x * y).sum.hop))) == Seq(HSumProd))
  }
  test("pattern: ALS weighted operators matched") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", sparse(40, 30))
    val u = c.bindLocal("U", dense(40, 4, 6))
    val v = c.bindLocal("V", dense(30, 4, 7))
    assert(kinds(c.compilePlan(Seq(((x.neq0 * (u %*% v.t)) %*% v).hop))).contains(HWOuterRight))
    assert(kinds(c.compilePlan(Seq(((x.neq0 * (u %*% v.t)).t %*% u).hop))).contains(HWOuterLeft))
    assert(kinds(c.compilePlan(Seq(((((x.neq0 * (u %*% v.t))) - x) ^ 2.0).sum.hop))).contains(HWSLoss))
  }
  test("pattern: no match when an interior node has multiple consumers") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(40, 8))
    val v = c.bindLocal("v", dense(8, 1, 3))
    val xv = x %*% v
    val plan = c.compilePlan(Seq((x.t %*% xv).hop, (xv ^ 2.0).sum.hop))
    assert(!kinds(plan).contains(MMChainXtXv), plan.toString)
  }
  test("pattern: Fused fixed patterns ignore longer chains (paper's limitation)") {
    val c = fusedCtx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(40, 8))
    val y = c.bindLocal("Y", dense(40, 8, 5))
    val z = c.bindLocal("Z", dense(40, 8, 6))
    // sum(X*Y*Z) does not match the 2-operator sum(X*Y) pattern fully:
    // at most the top multiply fuses, the inner one materializes
    val plan = c.compilePlan(Seq((x * y * z).sum.hop))
    assert(plan.ops.exists(_.isInstanceOf[PBasic]), plan.toString)
  }

  test("kernels: mmchain local dense/sparse vs basic ops") {
    for (x <- Seq(dense(30, 6), sparse(30, 6, 8))) {
      val v = MatrixBlock.rand(6, 1, 1.0, 9)
      val w = MatrixBlock.rand(30, 1, 1.0, 10)
      val expect = LocalOps.matmul(LocalOps.transpose(x), LocalOps.matmul(x, v))
      assert(MatrixBlock.maxAbsDiff(HandCoded.mmchainLocal(x, v, None), expect) < 1e-9)
      val expectW = LocalOps.matmul(LocalOps.transpose(x),
        LocalOps.binary(Ops.Mult, LocalOps.matmul(x, v), w))
      assert(MatrixBlock.maxAbsDiff(HandCoded.mmchainLocal(x, v, Some(w)), expectW) < 1e-9)
    }
  }
  test("kernels: wsloss over non-zeros vs naive") {
    val x = sparse(25, 20, 11)
    val u = dense(25, 3, 12).toDense
    val v = dense(20, 3, 13).toDense
    var expect = 0.0
    for (i <- 0 until 25; j <- 0 until 20 if x.get(i, j) != 0.0) {
      val d = (0 until 3).map(k => u.get(i, k) * v.get(j, k)).sum - x.get(i, j)
      expect += d * d
    }
    assert(math.abs(HandCoded.wsloss(x, u, v).get(0, 0) - expect) < 1e-9)
  }
  test("kernels: wouter right/left vs naive") {
    val x = sparse(25, 20, 14)
    val u = dense(25, 3, 15).toDense
    val v = dense(20, 3, 16).toDense
    val w = dense(20, 4, 17).toDense
    val right = HandCoded.wouter(x, u, v, w, left = false)
    for (i <- 0 until 25; c <- 0 until 4) {
      val expect = (0 until 20).filter(j => x.get(i, j) != 0.0).map { j =>
        (0 until 3).map(k => u.get(i, k) * v.get(j, k)).sum * w.get(j, c)
      }.sum
      assert(math.abs(right.get(i, c) - expect) < 1e-9)
    }
    val w2 = dense(25, 4, 18).toDense
    val left = HandCoded.wouter(x, u, v, w2, left = true)
    for (j <- 0 until 20; c <- 0 until 4) {
      val expect = (0 until 25).filter(i => x.get(i, j) != 0.0).map { i =>
        (0 until 3).map(k => u.get(i, k) * v.get(j, k)).sum * w2.get(i, c)
      }.sum
      assert(math.abs(left.get(j, c) - expect) < 1e-9)
    }
  }
}
