package repro.dist

import repro.{SparkSpec, TestLA}
import repro.compiler._
import repro.core._
import repro.runtime._
import repro.runtime.Ops._

/** Distributed runtime: basic Dataset[BlockRow] operators against local
  * kernels, and fused distributed execution (mapGroups over row blocks)
  * against local fused execution. */
class DistSpec extends SparkSpec {

  private val blockSize = 32
  private def distCtx(mode: ExecMode = GenMode(CostBased)) =
    new ExecContext(mode, CostConfig(localMemBudget = 4L << 10, distLatencyS = 0.0),
      Some(spark), blockSize)

  private val xDense  = MatrixBlock.rand(100, 12, 1.0, 1, min = -1, max = 1)
  private val xSparse = MatrixBlock.rand(100, 12, 0.2, 2, min = -1, max = 1)

  test("fromLocal/toLocal round trip (dense, sparse, odd block boundary)") {
    for (m <- Seq(xDense, xSparse, MatrixBlock.rand(97, 5, 1.0, 3))) {
      val dm = DistOps.fromLocal(spark, m, blockSize)
      assert(MatrixBlock.maxAbsDiff(DistOps.toLocal(dm), m) == 0.0)
    }
  }
  test("distributed unary") {
    val dm = DistOps.fromLocal(spark, xDense, blockSize)
    val got = DistOps.toLocal(DistOps.unary(Sigmoid, dm))
    assert(MatrixBlock.maxAbsDiff(got, LocalOps.unary(Sigmoid, xDense)) < 1e-12)
  }
  test("distributed binary dist-dist") {
    val a = DistOps.fromLocal(spark, xDense, blockSize)
    val b = DistOps.fromLocal(spark, xSparse, blockSize)
    val got = DistOps.toLocal(DistOps.binaryDistDist(Plus, a, b))
    assert(MatrixBlock.maxAbsDiff(got, LocalOps.binary(Plus, xDense, xSparse)) < 1e-12)
  }
  test("distributed binary with broadcast row vector and sliced column vector") {
    val a = DistOps.fromLocal(spark, xDense, blockSize)
    val rv = MatrixBlock.rand(1, 12, 1.0, 4)
    val cv = MatrixBlock.rand(100, 1, 1.0, 5)
    assert(MatrixBlock.maxAbsDiff(
      DistOps.toLocal(DistOps.binaryDistLocal(Mult, a, rv)),
      LocalOps.binary(Mult, xDense, rv)) < 1e-12)
    assert(MatrixBlock.maxAbsDiff(
      DistOps.toLocal(DistOps.binaryDistLocal(Plus, a, cv)),
      LocalOps.binary(Plus, xDense, cv)) < 1e-12)
  }
  test("distributed matmul with broadcast rhs") {
    val a = DistOps.fromLocal(spark, xDense, blockSize)
    val w = MatrixBlock.rand(12, 4, 1.0, 6, min = -1, max = 1)
    val got = DistOps.toLocal(DistOps.matmulDistLocal(a, w))
    assert(MatrixBlock.maxAbsDiff(got, LocalOps.matmul(xDense, w)) < 1e-9)
  }
  test("distributed t(X) %*% Z, Z distributed") {
    val a = DistOps.fromLocal(spark, xDense, blockSize)
    val zL = MatrixBlock.rand(100, 3, 1.0, 7, min = -1, max = 1)
    val z = DistOps.fromLocal(spark, zL, blockSize)
    val got = DistOps.matmulTransposeLeft(a, Left(z))
    val expect = LocalOps.matmul(LocalOps.transpose(xDense), zL)
    assert(MatrixBlock.maxAbsDiff(got, expect) < 1e-9)
  }
  test("distributed t(X) %*% Z, Z local broadcast") {
    val a = DistOps.fromLocal(spark, xSparse, blockSize)
    val zL = MatrixBlock.rand(100, 3, 1.0, 8, min = -1, max = 1)
    val got = DistOps.matmulTransposeLeft(a, Right(zL))
    val expect = LocalOps.matmul(LocalOps.transpose(xSparse), zL)
    assert(MatrixBlock.maxAbsDiff(got, expect) < 1e-9)
  }
  test("distributed aggregations (full/col/row, sum/min/max)") {
    val a = DistOps.fromLocal(spark, xDense, blockSize)
    for (f <- Seq(SumAgg, MinAgg, MaxAgg)) {
      assert(MatrixBlock.maxAbsDiff(DistOps.fullAgg(f, a), LocalOps.agg(f, FullDir, xDense)) < 1e-9)
      assert(MatrixBlock.maxAbsDiff(DistOps.colAgg(f, a), LocalOps.agg(f, ColDir, xDense)) < 1e-9)
      assert(MatrixBlock.maxAbsDiff(DistOps.toLocal(DistOps.rowAgg(f, a)), LocalOps.agg(f, RowDir, xDense)) < 1e-9)
    }
  }

  /** Full pipeline over a distributed X vs the same pipeline local. */
  private def distVsLocal(tol: Double = 1e-9)(build: (ExecContext, MX) => Seq[MX]): Unit = {
    for (x0 <- Seq(xDense, xSparse); mode <- TestLA.allModes) {
      val dCtx = distCtx(mode)
      val dx = dCtx.bindDist("X", DistOps.fromLocal(spark, x0, blockSize))
      val dRes = dCtx.eval(build(dCtx, dx)).map(_.toLocal)
      val lCtx = new ExecContext(BaseMode)
      val lx = lCtx.bindLocal("X", x0)
      val lRes = lCtx.eval(build(lCtx, lx)).map(_.toLocal)
      dRes.zip(lRes).foreach { case (d, l) =>
        assert(MatrixBlock.maxAbsDiff(d, l) < tol, s"mode=${mode.label} dense=${!x0.isSparseFormat}")
      }
    }
  }

  test("distributed cell chain with aggregate equals local (all modes)") {
    distVsLocal() { (ctx, x) =>
      implicit val c: ExecContext = ctx
      Seq(((x * 2.0 + 1.0) ^ 2.0).sum, (x * x).rowSums)
    }
  }
  test("distributed mmchain t(X)(w*(Xv)) equals local (all modes)") {
    distVsLocal(1e-8) { (ctx, x) =>
      implicit val c: ExecContext = ctx
      val v = ctx.bindLocal("v", MatrixBlock.rand(12, 1, 1.0, 9))
      val w = ctx.bindLocal("w", MatrixBlock.rand(100, 1, 1.0, 10, min = 0.1, max = 1))
      Seq(x.t %*% (w * (x %*% v)))
    }
  }
  test("distributed Eq2 row pattern equals local (all modes)") {
    distVsLocal(1e-8) { (ctx, x) =>
      implicit val c: ExecContext = ctx
      val p = ctx.bindLocal("P", MatrixBlock.rand(100, 4, 1.0, 11, min = 0.1, max = 1))
      val v = ctx.bindLocal("V", MatrixBlock.rand(12, 4, 1.0, 12, min = -1, max = 1))
      val q = p * (x %*% v)
      Seq(x.t %*% (q - p * q.rowSums))
    }
  }
  test("distributed multi-aggregate equals local (all modes)") {
    distVsLocal(1e-8) { (ctx, x) =>
      implicit val c: ExecContext = ctx
      val y = ctx.bindLocal("Y", MatrixBlock.rand(100, 12, 1.0, 13, min = -1, max = 1))
      Seq((x ^ 2.0).sum, (x * y).sum)
    }
  }
  test("distributed outer-product operator equals local (Gen)") {
    val x0 = MatrixBlock.rand(100, 80, 0.1, 14, min = 0.1, max = 1)
    val u0 = MatrixBlock.rand(100, 5, 1.0, 15, min = -1, max = 1)
    val v0 = MatrixBlock.rand(80, 5, 1.0, 16, min = -1, max = 1)
    val lCtx = new ExecContext(BaseMode)
    val expect = {
      implicit val c: ExecContext = lCtx
      val x = lCtx.bindLocal("X", x0); val u = lCtx.bindLocal("U", u0); val v = lCtx.bindLocal("V", v0)
      lCtx.eval(Seq((x.neq0 * (u %*% v.t)) %*% v, (x * ((u %*% v.t) + 8.0).log).sum)).map(_.toLocal)
    }
    val dCtx = distCtx()
    val got = {
      implicit val c: ExecContext = dCtx
      val x = dCtx.bindDist("X", DistOps.fromLocal(spark, x0, blockSize))
      val u = dCtx.bindLocal("U", u0); val v = dCtx.bindLocal("V", v0)
      dCtx.eval(Seq((x.neq0 * (u %*% v.t)) %*% v, (x * ((u %*% v.t) + 8.0).log).sum)).map(_.toLocal)
    }
    got.zip(expect).foreach { case (g, e) => assert(MatrixBlock.maxAbsDiff(g, e) < 1e-8) }
  }
  test("distributed plans actually use distributed fused operators") {
    val dCtx = distCtx()
    implicit val c: ExecContext = dCtx
    val x = dCtx.bindDist("X", DistOps.fromLocal(spark, xDense, blockSize))
    val plan = dCtx.compilePlan(Seq(((x * 2.0) ^ 2.0).sum.hop))
    assert(plan.fusedOps.nonEmpty, plan.toString)
  }
}
