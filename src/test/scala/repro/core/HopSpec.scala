package repro.core

import repro.SparkSpec
import repro.runtime.Ops._

/** HOP IR: dimension and sparsity propagation, DAG utilities. */
class HopSpec extends SparkSpec {

  private def leaf(r: Long, c: Long, sp: Double = 1.0) = new LeafHop("x", r, c, sp)

  test("binary dims with equal shapes") {
    val b = new BinaryHop(Plus, leaf(10, 5), leaf(10, 5))
    assert(b.rows == 10 && b.cols == 5)
  }
  test("binary dims with column-vector broadcast") {
    val b = new BinaryHop(Mult, leaf(10, 5), leaf(10, 1))
    assert(b.rows == 10 && b.cols == 5)
  }
  test("binary dims with row-vector broadcast") {
    val b = new BinaryHop(Mult, leaf(10, 5), leaf(1, 5))
    assert(b.rows == 10 && b.cols == 5)
  }
  test("binary dims with scalar left") {
    val b = new BinaryHop(Minus, new LitHop(1.0), leaf(10, 5))
    assert(b.scalarLeft && b.rows == 10 && b.cols == 5)
  }
  test("incompatible binary dims rejected") {
    intercept[IllegalArgumentException](new BinaryHop(Plus, leaf(10, 5), leaf(9, 5)))
  }
  test("matmul dims and incompatibility") {
    val m = new MatMulHop(leaf(10, 5), leaf(5, 3))
    assert(m.rows == 10 && m.cols == 3)
    intercept[IllegalArgumentException](new MatMulHop(leaf(10, 5), leaf(4, 3)))
  }
  test("transpose swaps dims") {
    val t = new TransposeHop(leaf(10, 5))
    assert(t.rows == 5 && t.cols == 10)
  }
  test("agg dims per direction") {
    val x = leaf(10, 5)
    assert(new AggHop(SumAgg, FullDir, x).rows == 1 && new AggHop(SumAgg, FullDir, x).cols == 1)
    assert(new AggHop(SumAgg, RowDir, x).rows == 10 && new AggHop(SumAgg, RowDir, x).cols == 1)
    assert(new AggHop(SumAgg, ColDir, x).rows == 1 && new AggHop(SumAgg, ColDir, x).cols == 5)
  }
  test("row slice dims and validation") {
    val s = new RowSliceHop(leaf(10, 5), 2, 7)
    assert(s.rows == 5 && s.cols == 5)
    intercept[IllegalArgumentException](new RowSliceHop(leaf(10, 5), 7, 2))
  }

  test("sparsity: sparse-safe unary preserves, unsafe densifies") {
    val x = leaf(10, 10, 0.1)
    assert(new UnaryHop(Abs, x).sparsity == 0.1)
    assert(new UnaryHop(Exp, x).sparsity == 1.0)
  }
  test("sparsity: multiply is the product, plus is capped sum") {
    val a = leaf(10, 10, 0.2); val b = leaf(10, 10, 0.5)
    assert(math.abs(new BinaryHop(Mult, a, b).sparsity - 0.1) < 1e-12)
    assert(math.abs(new BinaryHop(Plus, a, b).sparsity - 0.7) < 1e-12)
  }
  test("sparsity: matmult estimator grows with the common dimension") {
    val a = leaf(100, 50, 0.01); val b = leaf(50, 100, 0.01)
    val m = new MatMulHop(a, b)
    assert(m.sparsity > 0.0 && m.sparsity <= 1.0)
    val wide = new MatMulHop(leaf(100, 500, 0.01), leaf(500, 100, 0.01))
    assert(wide.sparsity > m.sparsity)
  }
  test("nnz derives from sparsity") {
    assert(leaf(100, 10, 0.25).nnz == 250)
  }

  test("Hop.collect returns a topological order, each node once") {
    val x = leaf(10, 5)
    val shared = new UnaryHop(Exp, x)
    val r1 = new AggHop(SumAgg, FullDir, shared)
    val r2 = new UnaryHop(Abs, shared)
    val order = Hop.collect(Seq(r1, r2))
    assert(order.count(_ eq shared) == 1)
    assert(order.indexOf(shared) < order.indexOf(r1))
    assert(order.indexOf(shared) < order.indexOf(r2))
    assert(order.indexOf(x) < order.indexOf(shared))
  }
  test("Hop.consumers counts all parents") {
    val x = leaf(10, 5)
    val shared = new UnaryHop(Exp, x)
    val r1 = new AggHop(SumAgg, FullDir, shared)
    val r2 = new UnaryHop(Abs, shared)
    val cons = Hop.consumers(Seq(r1, r2))
    assert(cons(shared.id).size == 2)
    assert(cons(x.id).size == 1)
  }
  test("node identity is reference identity (CSEs stay shared)") {
    val x = leaf(10, 5)
    val a = new UnaryHop(Exp, x)
    val b = new UnaryHop(Exp, x)
    assert(a != b && a == a)
  }
}
