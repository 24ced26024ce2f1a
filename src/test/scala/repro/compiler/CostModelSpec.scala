package repro.compiler

import repro.SparkSpec
import repro.core._
import repro.runtime._

/** Analytical cost model (paper Eq. 4): size/flop estimates, fusion
  * benefits, sparsity scaling, distributed penalties, and constraints. */
class CostModelSpec extends SparkSpec {

  private val cfg = CostConfig()
  private def ctx = new ExecContext(GenMode(CostBased), cfg)
  private def dense(r: Int, c: Int, s: Long = 1) = MatrixBlock.rand(r, c, 1.0, s, min = -1, max = 1)

  test("sizeBytes: dense vs sparse representation") {
    val d = new LeafHop("d", 1000, 100, 1.0)
    val s = new LeafHop("s", 1000, 100, 0.01)
    assert(CostModel.sizeBytes(d) == 1000 * 100 * 8.0)
    assert(CostModel.sizeBytes(s) == 1000 * 12.0) // nnz * 12
  }
  test("flops: matmult scales with dims and lhs sparsity") {
    val mmD = new MatMulHop(new LeafHop("a", 100, 50, 1.0), new LeafHop("b", 50, 20, 1.0))
    val mmS = new MatMulHop(new LeafHop("a", 100, 50, 0.1), new LeafHop("b", 50, 20, 1.0))
    assert(CostModel.flops(mmD) == 2.0 * 100 * 50 * 20)
    assert(math.abs(CostModel.flops(mmS) - 0.1 * 2.0 * 100 * 50 * 20) < 1e-6)
  }

  test("fused plan costs less than base plan (fewer intermediates)") {
    val c = ctx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(1000, 100))
    val y = c.bindLocal("Y", dense(1000, 100, 2))
    val roots = Seq(((x * y) * 2.0).sum.hop)
    val memo = Explorer.explore(roots)
    val fused = Selector.select(roots, memo, CostBased, cfg)
    val base = ExecPlan(Hop.collect(roots).collect {
      case h if !h.isInstanceOf[LeafHop] && !h.isInstanceOf[LitHop] => PBasic(h)
    })
    assert(CostModel.planCost(fused, cfg) < CostModel.planCost(base, cfg))
  }

  test("sparsity-exploiting Outer plan costs less than dense coverage") {
    val c = ctx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", MatrixBlock.rand(2000, 2000, 0.01, 3))
    val u = c.bindLocal("U", dense(2000, 10, 4))
    val v = c.bindLocal("V", dense(2000, 10, 5))
    val roots = Seq((x * (u %*% v.t)).sum.hop)
    val memo = Explorer.explore(roots)
    val gen = Selector.select(roots, memo.copyTable(), CostBased, cfg)
    val outer = gen.ops.collect { case PFused(s) if s.tpe == OuterTpl => s }
    assert(outer.nonEmpty)
    val scale = CostModel.sparsityScale(outer.head)
    assert(scale < 0.05, s"driver sparsity scale $scale")
  }

  test("distributed side inputs are penalized (broadcast cost)") {
    val smallCfg = cfg.copy(localMemBudget = 1L << 16)
    // X 10^5 x 100 = 80 MB > 64 KB budget -> distributed
    val x = new LeafHop("X", 100000, 100, 1.0)
    val v = new LeafHop("v", 100, 1, 1.0)
    val mm = new MatMulHop(x, v)
    val distCost = CostModel.opCost(PBasic(mm), smallCfg)
    val localCost = CostModel.opCost(PBasic(mm), cfg)
    assert(distCost > localCost, s"$distCost !> $localCost (latency + broadcast penalty)")
  }

  test("constraint Z: infinite cost for wide distributed Row operators") {
    val smallCfg = cfg.copy(localMemBudget = 1L << 16, blockCols = 64)
    val x = new LeafHop("X", 100000, 300, 1.0) // wide + distributed
    val v = new LeafHop("v", 300, 1, 1.0)
    val mm = new MatMulHop(x, v)
    val spec = FusedSpec(mm, RowTpl, Map(mm.id -> MemoEntry(RowTpl, IndexedSeq(-1L, -1L), OpenValid)),
      IndexedSeq(x, v))
    assert(CostModel.opCost(PFused(spec), smallCfg).isPosInfinity)
  }

  test("lower bound never exceeds the actual optimal cost") {
    val c = ctx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(2000, 50))
    val p = c.bindLocal("P", dense(2000, 4, 6))
    val v = c.bindLocal("V", dense(50, 4, 7))
    val q = p * (x %*% v)
    val roots = Seq((x.t %*% (q - p * q.rowSums)).hop)
    val memo = Explorer.explore(roots)
    val parts = Partitions.analyze(roots, memo)
    for (part <- parts) {
      val (_, bruteCost) = Selector.bruteForcePartition(roots, memo, part, cfg)
      val lb = CostModel.lowerBound(part, memo, Set.empty, cfg)
      assert(lb <= bruteCost + 1e-12, s"lb $lb > optimal $bruteCost")
    }
  }

  test("multi-aggregate reads shared inputs once") {
    val c = ctx
    implicit val cc: ExecContext = c
    val x = c.bindLocal("X", dense(5000, 100))
    val y = c.bindLocal("Y", dense(5000, 100, 8))
    val roots = Seq((x ^ 2.0).sum.hop, (x * y).sum.hop)
    val memo = Explorer.explore(roots)
    val plan = Selector.select(roots, memo, CostBased, cfg)
    val magg = plan.ops.collect { case m: PMultiAgg => m }
    assert(magg.nonEmpty, plan.toString)
    // cost of the merged op < two separate fused aggregates (X read once)
    val merged = CostModel.opCost(magg.head, cfg)
    val separate = magg.head.specs.map(s => CostModel.opCost(PFused(s), cfg)).sum
    assert(merged < separate)
  }
}
