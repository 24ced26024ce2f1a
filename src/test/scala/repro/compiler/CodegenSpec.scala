package repro.compiler

import repro.{SparkSpec, TestLA}
import repro.core._
import repro.runtime._

/** End-to-end equivalence of all execution modes (Base, Fused, Gen,
  * Gen-FA, Gen-FNR) on the paper's fusion patterns, dense and sparse, plus
  * assertions that Gen actually fuses. */
class CodegenSpec extends SparkSpec {

  private def dense(r: Int, c: Int, seed: Long) = MatrixBlock.rand(r, c, 1.0, seed, min = -1, max = 1)
  private def sparse(r: Int, c: Int, seed: Long) = MatrixBlock.rand(r, c, 0.2, seed, min = -1, max = 1)
  private def pos(r: Int, c: Int, seed: Long) = MatrixBlock.rand(r, c, 1.0, seed, min = 0.1, max = 1)

  // ---- Fig. 1(a): Cell — sum(X * Y * Z) -------------------------------
  test("Fig1a: sum(X*Y*Z) dense") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(40, 30, 1))
      val y = ctx.bindLocal("Y", dense(40, 30, 2))
      val z = ctx.bindLocal("Z", dense(40, 30, 3))
      Seq((x * y * z).sum)
    }
  }
  test("Fig1a: sum(X*Y*Z) sparse driver") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", sparse(40, 30, 4))
      val y = ctx.bindLocal("Y", dense(40, 30, 5))
      val z = ctx.bindLocal("Z", dense(40, 30, 6))
      Seq((x * y * z).sum)
    }
  }
  test("Fig1a Gen plan is a single fused operator") {
    val plan = TestLA.genFusesAtLeast(1) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(40, 30, 1))
      val y = ctx.bindLocal("Y", dense(40, 30, 2))
      val z = ctx.bindLocal("Z", dense(40, 30, 3))
      Seq((x * y * z).sum)
    }
    assert(plan.ops.size == 1, plan.toString)
  }

  // ---- cell chains with broadcasting / scalars -------------------------
  test("cell chain with scalar-left and comparison: out = 1 - Y*(Xw); sv = out>0") {
    TestLA.modesAgree() { implicit ctx =>
      val y = ctx.bindLocal("Y", dense(50, 1, 7))
      val xw = ctx.bindLocal("Xw", dense(50, 1, 8))
      val out = MX.lit(1.0) - y * xw
      Seq(out * (out > 0.0), (out * (out > 0.0) * y).sum)
    }
  }
  test("cell chain with col-vector and row-vector side inputs") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(30, 20, 9))
      val c = ctx.bindLocal("c", dense(30, 1, 10))
      val r = ctx.bindLocal("r", dense(1, 20, 11))
      Seq((x * c + r) * 2.0 - 1.0)
    }
  }
  test("cell unary chain: sigmoid(exp(log(abs(X)+1)))") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(25, 15, 12))
      Seq(((x.abs + 1.0).log).exp.sigmoid)
    }
  }
  test("cell row/col/full aggregations over fused chains") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(30, 12, 13))
      val y = ctx.bindLocal("Y", dense(30, 12, 14))
      Seq((x * y).rowSums, (x * y).colSums, (x * y).sum, (x - y).rowMins)
    }
  }
  test("cell sparse-safe NoAgg output stays sparse under Gen") {
    val ctx = new ExecContext(GenMode(CostBased))
    implicit val c: ExecContext = ctx
    val x = ctx.bindLocal("X", sparse(40, 30, 15))
    val y = ctx.bindLocal("Y", dense(40, 30, 16))
    val res = ctx.eval(Seq(x * y * 2.0)).head.toLocal
    assert(res.isSparseFormat, "sparse-safe cell output should remain sparse")
  }

  // ---- Fig. 1(c): multi-aggregates -------------------------------------
  test("Fig1c: sum(X^2), sum(X*Y), sum(Y^2) dense and sparse") {
    for (mk <- Seq(dense _, sparse _))
      TestLA.modesAgree() { implicit ctx =>
        val x = ctx.bindLocal("X", mk(35, 25, 17))
        val y = ctx.bindLocal("Y", mk(35, 25, 18))
        Seq((x ^ 2.0).sum, (x * y).sum, (y ^ 2.0).sum)
      }
  }
  test("Fig1c Gen merges shared-input aggregates into a multi-aggregate") {
    val ctx = new ExecContext(GenMode(CostBased))
    implicit val c: ExecContext = ctx
    val x = ctx.bindLocal("X", dense(35, 25, 17))
    val y = ctx.bindLocal("Y", dense(35, 25, 18))
    val plan = ctx.compilePlan(Seq((x ^ 2.0).sum, (x * y).sum, (y ^ 2.0).sum).map(_.hop))
    assert(plan.ops.exists(_.isInstanceOf[PMultiAgg]), plan.toString)
  }

  // ---- Fig. 1(b) / Eq. (2): Row ----------------------------------------
  test("Fig1b: t(X) %*% (X %*% v)") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(60, 10, 19))
      val v = ctx.bindLocal("v", dense(10, 1, 20))
      Seq(x.t %*% (x %*% v))
    }
  }
  test("weighted mmchain: t(X) %*% (w * (X %*% v))") {
    TestLA.modesAgree() { implicit ctx =>
      val x = ctx.bindLocal("X", dense(60, 10, 21))
      val v = ctx.bindLocal("v", dense(10, 1, 22))
      val w = ctx.bindLocal("w", pos(60, 1, 23))
      Seq(x.t %*% (w * (x %*% v)))
    }
  }
  test("Eq2 MLogreg pattern: H = t(X)(Q - P*rowSums(Q)), Q = P*(Xv)") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(50, 8, 24))
      val p = ctx.bindLocal("P", pos(50, 4, 25))
      val v = ctx.bindLocal("V", dense(8, 4, 26))
      val q = p * (x %*% v)
      Seq(x.t %*% (q - p * q.rowSums))
    }
  }
  test("Eq2 over sparse X") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", sparse(50, 8, 27))
      val p = ctx.bindLocal("P", pos(50, 4, 28))
      val v = ctx.bindLocal("V", dense(8, 4, 29))
      val q = p * (x %*% v)
      Seq(x.t %*% (q - p * q.rowSums))
    }
  }
  test("Eq2 Gen plan fuses into a single pass over X") {
    val plan = TestLA.genFusesAtLeast(1) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(50, 8, 24))
      val p = ctx.bindLocal("P", pos(50, 4, 25))
      val v = ctx.bindLocal("V", dense(8, 4, 26))
      val q = p * (x %*% v)
      Seq(x.t %*% (q - p * q.rowSums))
    }
    assert(plan.ops.size == 1, s"expected one fused operator:\n$plan")
  }
  test("matrix-matrix chain t(X) %*% (X %*% V) with narrow V") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(40, 12, 30))
      val v = ctx.bindLocal("V", dense(12, 3, 31))
      Seq(x.t %*% (x %*% v))
    }
  }
  test("row chain ending in colSums and sum") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(40, 12, 32))
      val v = ctx.bindLocal("v", dense(12, 1, 33))
      val xv = x %*% v
      Seq((x * xv).colSums, (x * xv).sum)
    }
  }

  // ---- Fig. 1(d) / Eq. (1): Outer --------------------------------------
  test("Fig1d: sum(X * log(U t(V) + eps)) sparse and dense") {
    for (sp <- Seq(0.1, 1.0))
      TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
        val x = ctx.bindLocal("X", MatrixBlock.rand(40, 35, sp, 34, min = 0.1, max = 1))
        val u = ctx.bindLocal("U", pos(40, 6, 35))
        val v = ctx.bindLocal("V", pos(35, 6, 36))
        Seq((x * ((u %*% v.t) + 1e-15).log).sum)
      }
  }
  test("Eq1 ALS right_mm: ((X!=0) * (U t(V))) %*% V + 1e-6*U*r") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", sparse(45, 38, 37))
      val u = ctx.bindLocal("U", dense(45, 5, 38))
      val v = ctx.bindLocal("V", dense(38, 5, 39))
      val r = ctx.bindLocal("r", dense(45, 1, 40))
      Seq(((x.neq0 * (u %*% v.t)) %*% v) + u * 1e-6 * r)
    }
  }
  test("ALS left_mm: t((X!=0) * (U t(V))) %*% U") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", sparse(45, 38, 41))
      val u = ctx.bindLocal("U", dense(45, 5, 42))
      val v = ctx.bindLocal("V", dense(38, 5, 43))
      Seq((x.neq0 * (u %*% v.t)).t %*% u)
    }
  }
  test("wsloss: sum(((X!=0) * (U t(V)) - X)^2)") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", sparse(45, 38, 44))
      val u = ctx.bindLocal("U", dense(45, 5, 45))
      val v = ctx.bindLocal("V", dense(38, 5, 46))
      Seq((((x.neq0 * (u %*% v.t)) - x) ^ 2.0).sum)
    }
  }
  test("Outer Gen plan avoids the dense UV' intermediate (sparse-safe op)") {
    val ctx = new ExecContext(GenMode(CostBased))
    implicit val c: ExecContext = ctx
    val x = ctx.bindLocal("X", sparse(45, 38, 37))
    val u = ctx.bindLocal("U", dense(45, 5, 38))
    val v = ctx.bindLocal("V", dense(38, 5, 39))
    val plan = ctx.compilePlan(Seq(((x.neq0 * (u %*% v.t)) %*% v).hop))
    val outer = plan.ops.collect { case PFused(s) if s.tpe == OuterTpl => s }
    assert(outer.nonEmpty, s"expected an Outer operator:\n$plan")
  }

  // ---- CSEs and materialization points ----------------------------------
  test("shared subexpression with two consumers (materialization point)") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(30, 10, 47))
      val y = ctx.bindLocal("Y", dense(30, 10, 48))
      val shared = (x * y).exp
      Seq(shared.rowSums, (shared * 2.0).colSums, shared.sum)
    }
  }
  test("overlapping fused operators over one intermediate") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(30, 10, 49))
      val v = ctx.bindLocal("v", dense(10, 1, 50))
      val xv = x %*% v
      Seq((x * xv).sum, (xv ^ 2.0).sum)
    }
  }
  test("mini-batch slice feeding a fused chain") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(64, 10, 51))
      val w = ctx.bindLocal("W", dense(10, 4, 52))
      val b = ctx.bindLocal("b", dense(1, 4, 53))
      val xb = x.sliceRows(16, 48)
      Seq(((xb %*% w) + b).sigmoid)
    }
  }
  test("kmeans-style assignment: A = (D == rowMins(D))") {
    TestLA.modesAgree(tol = 1e-8) { implicit ctx =>
      val x = ctx.bindLocal("X", dense(40, 6, 54))
      val cB = ctx.bindLocal("C", dense(5, 6, 55))
      val d = (x %*% cB.t) * -2.0 + ((cB ^ 2.0).rowSums).t
      val a = d.eqv(d.rowMins)
      Seq(a.colSums, a.t %*% x)
    }
  }

  // ---- plan cache -------------------------------------------------------
  test("plan cache hits on repeated identical DAGs") {
    Codegen.clearCache()
    CodegenStats.reset()
    def once(): Unit = {
      val ctx = new ExecContext(GenMode(CostBased))
      implicit val c: ExecContext = ctx
      val x = ctx.bindLocal("X", dense(30, 10, 56))
      val y = ctx.bindLocal("Y", dense(30, 10, 57))
      ctx.eval(Seq((x * y).sum))
    }
    once(); val compiledAfter1 = CodegenStats.operatorsCompiled.get()
    once(); once()
    assert(CodegenStats.operatorsCompiled.get() == compiledAfter1,
      "identical DAGs must not recompile operators")
    assert(CodegenStats.planCacheHits.get() >= 2)
  }
}
