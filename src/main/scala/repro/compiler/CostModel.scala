package repro.compiler

import repro.core._
import repro.runtime.Ops._

/** Cost model configuration: peak bandwidths and execution-type
  * constraints (paper §4.3 and "Constraints and Distributed Operations").
  * Absolute values need not match the hardware — plan choice depends on
  * ratios — but defaults approximate a single-threaded JVM runtime.
  */
final case class CostConfig(
    readBandwidth: Double = 32e9,     // B/s, local reads
    writeBandwidth: Double = 16e9,    // B/s, local writes (alloc + write)
    computeBandwidth: Double = 50e9,  // FLOP/s (paper-like ratio: element-wise ops are IO-bound, matmults compute-bound)
    distReadBandwidth: Double = 1e9,  // B/s for broadcasts/shuffles of side inputs
    distLatencyS: Double = 0.05,      // per distributed operation (job launch)
    localMemBudget: Long = 4L << 30,  // bytes: larger intermediates go distributed
    blockCols: Long = 4096,           // B_c: max ncol for distributed Row templates
    broadcastBudget: Long = 1L << 30, // max bytes per broadcast side input
)

/** Analytical, time-based cost model for execution plans (paper Eq. 4):
  * C = sum_p ( T^w_p + max(T^r_p, T^c_p) ), with sparsity-exploiting
  * operators scaling compute by the sparsity of the main input, and
  * penalized reads for local side inputs of distributed operators.
  */
object CostModel {

  /** Estimated serialized size of a hop's output. */
  def sizeBytes(h: Hop): Double = {
    val sparse = h.sparsity < 0.4 && h.numCells > 1
    if (sparse) h.nnz.toDouble * 12.0 else h.numCells.toDouble * 8.0
  }

  /** Effective flops of a scalar op — transcendental functions cost far
    * more than one FLOP (important for redundant-compute decisions over
    * exp/log chains). */
  private def opWeight(op: UnaryOp): Double = op match {
    case Exp | Log | Sigmoid => 32.0
    case Sqrt                => 8.0
    case _                   => 1.0
  }
  private def opWeight(op: BinaryOp): Double = op match {
    case Pow => 32.0
    case Div => 4.0
    case _   => 1.0
  }

  /** Floating point operations to compute `h` from materialized inputs. */
  def flops(h: Hop): Double = h match {
    case m: MatMulHop =>
      2.0 * m.left.rows * m.left.cols * m.right.cols *
        math.max(m.left.sparsity, 1e-12)
    case u: UnaryHop     => h.numCells.toDouble * opWeight(u.op)
    case b: BinaryHop    => h.numCells.toDouble * opWeight(b.op)
    case a: AggHop       => a.in.numCells.toDouble
    case t: TransposeHop => t.in.numCells.toDouble
    case r: RowSliceHop  => r.numCells.toDouble
    case _               => 0.0
  }

  /** Does this hop's output live distributed (mirrors the executor)? */
  def isDistributedHop(h: Hop, cfg: CostConfig): Boolean = h match {
    case l: LeafHop => l.forceDistributed || sizeBytes(h) > cfg.localMemBudget.toDouble
    case _          => sizeBytes(h) > cfg.localMemBudget.toDouble
  }

  /** Cost of a single plan operator. */
  def opCost(op: POp, cfg: CostConfig): Double = {
    val outputs = op.outputs
    val inputs = op.inputs.distinct.filterNot(_.isInstanceOf[LitHop])
    val dist = (outputs ++ inputs).exists(isDistributedHop(_, cfg))

    // constraint Z: distributed Row templates need whole rows per block;
    // distributed side inputs must fit the broadcast budget
    op match {
      case PFused(spec) if dist =>
        val main = spec.inputs.headOption
        if (spec.tpe == RowTpl && main.exists(m => isDistributedHop(m, cfg) && m.cols > cfg.blockCols))
          return Double.PositiveInfinity
        val sides = spec.inputs.drop(1)
        if (sides.exists(s => !isDistributedHop(s, cfg) && sizeBytes(s) > cfg.broadcastBudget.toDouble))
          return Double.PositiveInfinity
      case _ =>
    }

    val readTime = inputs.map { in =>
      val bw =
        if (dist && !isDistributedHop(in, cfg)) cfg.distReadBandwidth // broadcast penalty
        else cfg.readBandwidth
      sizeBytes(in) / bw
    }.sum

    val writeTime = outputs.map(o => sizeBytes(o) / cfg.writeBandwidth).sum

    val computeTime = op match {
      case PBasic(h) => flops(h) / cfg.computeBandwidth
      case PFused(spec) =>
        val total = coveredFlops(spec)
        val scale = sparsityScale(spec)
        // Row skeletons densify the main row per iteration (no native
        // sparse-row genexec): charge the full cell count of the main
        val densify =
          if (spec.tpe == RowTpl)
            spec.inputs.headOption.map(_.numCells.toDouble).getOrElse(0.0)
          else 0.0
        (total * scale + densify) / cfg.computeBandwidth
      case PMultiAgg(specs) =>
        specs.map(s => coveredFlops(s) * sparsityScale(s)).sum / cfg.computeBandwidth
    }

    val latency = if (dist) cfg.distLatencyS else 0.0
    writeTime + math.max(readTime, computeTime) + latency
  }

  private def coveredFlops(spec: FusedSpec): Double =
    CPlan.coveredHops(spec.root, spec.covered.keySet).map(flops).sum

  /** Sparsity-exploiting operators scale compute by the driver sparsity. */
  def sparsityScale(spec: FusedSpec): Double = spec.tpe match {
    case OuterTpl =>
      // driver = the sparse-safe, full-dimension input
      val chainRoot = spec.root match {
        case a: AggHop    => a.in
        case m: MatMulHop if !TemplateType.isOuterMatMul(m) =>
          m.left match { case t: TransposeHop if spec.covered.contains(t.id) => t.in; case l => l }
        case h => h
      }
      spec.inputs.find(in => in.rows == chainRoot.rows && in.cols == chainRoot.cols &&
          CPlan.isSparseSafe(chainRoot, spec.covered.keySet, in))
        .map(d => math.max(d.sparsity, 1e-9)).getOrElse(1.0)
    case CellTpl | MAggTpl =>
      val chainRoot = spec.root match { case a: AggHop => a.in; case h => h }
      val full = spec.inputs.filter(in => in.rows == chainRoot.rows && in.cols == chainRoot.cols && in.numCells > 1)
      val safe = full.filter(in => CPlan.isSparseSafe(chainRoot, spec.covered.keySet, in))
      safe.map(_.sparsity).minOption.getOrElse(1.0)
    case _ => 1.0
  }

  /** Cost of the full plan, optionally restricted to operators touching
    * `scope` (a plan partition), with early exit once the running cost
    * exceeds `bound` (partial costing, paper §4.4). */
  def planCost(plan: ExecPlan, cfg: CostConfig,
               scope: Option[Set[Long]] = None,
               bound: Double = Double.PositiveInfinity): Double = {
    var c = 0.0
    val it = plan.ops.iterator
    while (it.hasNext && c < bound) {
      val op = it.next()
      val inScope = scope.forall(s =>
        op.outputs.exists(o => s.contains(o.id)) || opCoversScope(op, s))
      if (inScope) c += opCost(op, cfg)
    }
    c
  }

  private def opCoversScope(op: POp, scope: Set[Long]): Boolean = op match {
    case PFused(spec)    => spec.covered.keysIterator.exists(scope.contains)
    case PMultiAgg(sp)   => sp.exists(_.covered.keysIterator.exists(scope.contains))
    case _               => false
  }

  /** Lower bound of any plan of `partition` under assignment `q` (paper
    * §4.4, C_lb = C_static + GetMPCost): reads of partition inputs,
    * minimal computation (each node once, at the best possible sparsity
    * scaling), writes of partition roots, plus one write + read per
    * distinct materialized target. Since per-operator cost is
    * write + max(read, compute), summing max(Σread, Σcompute) is sound. */
  def lowerBound(partition: PlanPartition, memo: MemoTable,
                 materializedTargets: Set[Long], cfg: CostConfig): Double = {
    val readFloor =
      partition.inputs.toSeq.map(id => sizeBytes(memo.hop(id)) / cfg.readBandwidth).sum
    val writeFloor =
      partition.roots.toSeq.map(id => sizeBytes(memo.hop(id)) / cfg.writeBandwidth).sum
    // the smallest sparsity any sparsity-exploiting operator could scale by
    val minScale = math.max(1e-9,
      (partition.nodes ++ partition.inputs).map(id => memo.hop(id).sparsity).minOption.getOrElse(1.0))
    val computeFloor =
      partition.nodes.toSeq.map(id => flops(memo.hop(id))).sum * minScale / cfg.computeBandwidth
    val mp = materializedTargets.toSeq.map { id =>
      val h = memo.hop(id)
      sizeBytes(h) / cfg.writeBandwidth + sizeBytes(h) / cfg.readBandwidth
    }.sum
    math.max(readFloor, computeFloor) + writeFloor + mp
  }
}
