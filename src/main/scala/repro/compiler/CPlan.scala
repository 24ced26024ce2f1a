package repro.compiler

import repro.core._
import repro.runtime.Ops._

/** A selected fused operator: a root HOP, the covered sub-DAG (hop id ->
  * chosen memo entry), and the materialized inputs read by the operator.
  */
final case class FusedSpec(
    root: Hop,
    tpe: TemplateType,
    covered: Map[Long, MemoEntry],
    inputs: IndexedSeq[Hop],
)

/** One operator of a final execution plan. */
sealed trait POp {
  /** HOPs materialized by this operator. */
  def outputs: Seq[Hop]
  def inputs: Seq[Hop]
}
/** Basic (unfused) operator: compute `hop` from materialized inputs. */
final case class PBasic(hop: Hop) extends POp {
  def outputs: Seq[Hop] = Seq(hop)
  def inputs: Seq[Hop] = hop.inputs
}
/** Fused operator from a single template instance. */
final case class PFused(spec: FusedSpec) extends POp {
  def outputs: Seq[Hop] = Seq(spec.root)
  def inputs: Seq[Hop] = spec.inputs
}
/** Multi-aggregate: k full aggregates sharing inputs, one scan (paper Fig. 1(c)). */
final case class PMultiAgg(specs: Seq[FusedSpec]) extends POp {
  def outputs: Seq[Hop] = specs.map(_.root)
  def inputs: Seq[Hop] = specs.flatMap(_.inputs).distinct
}
/** Hand-coded fused operator of the "Fused" baseline (fixed patterns). */
final case class PHandCoded(kind: HandKind, root: Hop, covered: Set[Long],
                            inputs: IndexedSeq[Hop]) extends POp {
  def outputs: Seq[Hop] = Seq(root)
}

/** Fixed patterns of SystemML's hand-coded fused operators (paper §1, [7,13,37]). */
sealed trait HandKind { def name: String }
case object MMChainXtXv  extends HandKind { val name = "mmchain(t(X)%*%(X%*%v))" }
case object MMChainXtwXv extends HandKind { val name = "mmchain(t(X)%*%(w*(X%*%v)))" }
case object HSumSq       extends HandKind { val name = "sum(X^2)" }
case object HSumProd     extends HandKind { val name = "sum(X*Y)" }
case object HWSLoss      extends HandKind { val name = "wsloss" }
case object HWOuterRight extends HandKind { val name = "wdivmm-right" }
case object HWOuterLeft  extends HandKind { val name = "wdivmm-left" }

/** Execution plan: operators in topological order (producers first). */
final case class ExecPlan(ops: Seq[POp]) {
  def fusedOps: Seq[POp] = ops.filterNot(_.isInstanceOf[PBasic])
  override def toString: String = ops.map {
    case PBasic(h)    => s"  basic $h"
    case PFused(s)    => s"  fused[${s.tpe}] root=${s.root} covered={${s.covered.keys.toSeq.sorted.mkString(",")}} inputs=${s.inputs.mkString(",")}"
    case PMultiAgg(s) => s"  multiAgg roots=${s.map(_.root).mkString(",")}"
    case PHandCoded(k, r, _, in) => s"  hand[${k.name}] root=$r inputs=${in.mkString(",")}"
  }.mkString("ExecPlan(\n", "\n", "\n)")
}

/** Row template output variants (paper Table 1). */
sealed trait RowVariant
case object RowNoAgg   extends RowVariant // output rowDim x m
case object RowRowAgg  extends RowVariant // output rowDim x 1
case object RowColAgg  extends RowVariant // output 1 x m, accumulated
case object RowFullAgg extends RowVariant // scalar
case object RowColAggT extends RowVariant // t(X) %*% Z: output cols(X) x cols(Z) (COL_AGG_B1_T)

/** Outer template output variants (paper Table 1). */
sealed trait OuterVariant
case object OuterNoAgg   extends OuterVariant // dense chain output (rare)
case object OuterFullAgg extends OuterVariant // sum over chain
case object OuterRightMM extends OuterVariant // chain %*% W
case object OuterLeftMM  extends OuterVariant // t(chain) %*% W

/** Backend-independent code generation plan for one fused operator
  * (paper §2.2): covered sub-DAG plus resolved data binding — ordered
  * inputs with the main (template-bound) input first, the output variant,
  * and sparse-safety of the chain w.r.t. the main input.
  */
final case class CPlan(
    tpe: TemplateType,
    roots: IndexedSeq[Hop],          // >1 only for MAgg
    covered: Set[Long],
    inputs: IndexedSeq[Hop],         // main input at index 0 (if any matrix input)
    sparseSafe: Boolean,
    rowVariant: Option[RowVariant],
    outerVariant: Option[OuterVariant],
    cellAgg: Option[(AggFunc, AggDir)],
    maggFuncs: IndexedSeq[AggFunc],
    rowDim: Long,
) {
  def root: Hop = roots.head

  /** Structural key, independent of hop ids and matrix sizes — the plan
    * cache key (paper §2.1: "identifies equivalent CPlans via hashing").
    * Generated operators are shape-generic (dimensions are read from the
    * inputs at runtime), so the same operator serves all data sizes; only
    * the broadcast class of each input is part of the key. */
  lazy val structuralKey: String = {
    def sig(h: Hop, depth: Int): String =
      if (depth > 32) "..."
      else if (!covered.contains(h.id)) s"in${inputs.indexWhere(_ eq h)}:${classify(h)}"
      else h.name + "(" + h.inputs.map(sig(_, depth + 1)).mkString(",") + ")"
    tpe.name + rowVariant.toString + outerVariant.toString + cellAgg.toString +
      roots.map(sig(_, 0)).mkString("|") + sparseSafe
  }

  lazy val structuralHash: Int = structuralKey.hashCode

  /** Broadcast class of a side input: scalar, column vector, row vector,
    * row-aligned matrix, or non-aligned matrix (matmult side). */
  private def classify(h: Hop): String =
    if (h.rows == 1 && h.cols == 1) "s"
    else if (h.cols == 1 && h.rows == rowDim) "c"
    else if (h.cols == 1) "v"
    else if (h.rows == 1) "r"
    else if (h.rows == rowDim) "m"
    else "w"
}

object CPlan {

  /** Is the covered chain from `target`'s perspective zero-propagating from
    * `main` — i.e., a zero in the main input forces a zero (or
    * aggregation-neutral) output, enabling sparse iteration? */
  def isSparseSafe(root: Hop, covered: Set[Long], main: Hop): Boolean = {
    def safe(h: Hop): Boolean = {
      if (h eq main) return true
      if (!covered.contains(h.id)) return false
      h match {
        case u: UnaryHop  => u.op.sparseSafe && safe(u.in)
        case b: BinaryHop => b.op match {
          case Mult => safe(b.left) || safe(b.right)
          case Div  => safe(b.left)
          case _    => false
        }
        case a: AggHop if a.func == SumAgg => safe(a.in)
        case m: MatMulHop => safe(m.left) // right_mm over a safe chain
        case t: TransposeHop => safe(t.in)
        case _ => false
      }
    }
    safe(root)
  }

  /** Build the CPlan for a selected fused operator. */
  def construct(spec: FusedSpec): CPlan = spec.tpe match {
    case CellTpl | MAggTpl => constructCell(spec)
    case RowTpl            => constructRow(spec)
    case OuterTpl          => constructOuter(spec)
  }

  private def constructCell(spec: FusedSpec): CPlan = {
    val covered = spec.covered.keySet
    val (cellAgg, chainRoot) = spec.root match {
      case a: AggHop => (Some((a.func, a.dir)), a.in)
      case h         => (None, h)
    }
    // main input: prefer a full-dimension input that makes the chain
    // sparse-safe (the "sparse driver"), sparsest first; else the largest
    val full = spec.inputs.filter(in => in.rows == chainRoot.rows && in.cols == chainRoot.cols && in.numCells > 1)
    val safeDrivers = full.filter(in => isSparseSafe(chainRoot, covered, in))
    val main = safeDrivers.sortBy(_.sparsity).headOption
      .orElse(full.sortBy(-_.numCells).headOption)
      .getOrElse(spec.inputs.maxByOption(_.numCells).getOrElse(spec.inputs.head))
    val ordered = main +: spec.inputs.filterNot(_ eq main)
    CPlan(spec.tpe, IndexedSeq(spec.root), covered, ordered,
      sparseSafe = safeDrivers.exists(_ eq main),
      rowVariant = None, outerVariant = None,
      cellAgg = cellAgg,
      maggFuncs =
        if (spec.tpe == MAggTpl) IndexedSeq(spec.root.asInstanceOf[AggHop].func)
        else IndexedSeq.empty,
      rowDim = chainRoot.rows)
  }

  private def constructRow(spec: FusedSpec): CPlan = {
    val covered = spec.covered.keySet
    // the row dimension: rows iterated by the skeleton
    val rowDim = spec.root match {
      case m: MatMulHop if TemplateType.isTransposeLeftMatMul(m) => m.right.rows
      case a: AggHop if a.dir == ColDir || a.dir == FullDir      => a.in.rows
      case h => h.rows
    }
    val variant = spec.root match {
      case m: MatMulHop if TemplateType.isTransposeLeftMatMul(m) => RowColAggT
      case a: AggHop => a.dir match {
        case ColDir  => RowColAgg
        case FullDir => RowFullAgg
        case RowDir  => RowRowAgg
      }
      case h if h.cols == 1 && h.rows == rowDim => RowRowAgg // vector chain output
      case _ => RowNoAgg
    }
    // main input: the largest row-aligned matrix input
    val rowAligned = spec.inputs.filter(in => in.rows == rowDim && in.numCells > 1 && in.cols > 1)
    val main = rowAligned.sortBy(-_.numCells).headOption
      .orElse(spec.inputs.find(in => in.rows == rowDim && in.numCells > 1))
      .getOrElse(spec.inputs.head)
    val ordered = main +: spec.inputs.filterNot(_ eq main)
    CPlan(RowTpl, IndexedSeq(spec.root), covered, ordered,
      sparseSafe = false, // Row binds to whole rows; sparse rows handled by the skeleton
      rowVariant = Some(variant), outerVariant = None, cellAgg = None,
      maggFuncs = IndexedSeq.empty, rowDim = rowDim)
  }

  private def constructOuter(spec: FusedSpec): CPlan = {
    val covered = spec.covered.keySet
    val (variant, chainRoot) = spec.root match {
      case a: AggHop                      => (OuterFullAgg, a.in)
      case m: MatMulHop if covered.contains(m.left.id) && m.left.isInstanceOf[TransposeHop] =>
        (OuterLeftMM, m.left.asInstanceOf[TransposeHop].in)
      case m: MatMulHop if !TemplateType.isOuterMatMul(m) => (OuterRightMM, m.left)
      case h => (OuterNoAgg, h)
    }
    // locate the opening outer-product matmult in the covered chain
    val opening = coveredHops(spec.root, covered)
      .collectFirst { case m: MatMulHop if TemplateType.isOuterMatMul(m) => m }
      .getOrElse(throw new IllegalStateException(s"Outer plan without opening matmult at ${spec.root}"))
    val u = opening.left
    val v = opening.right.asInstanceOf[TransposeHop].in
    // main = the sparse driver: the other operand of a covered mult/div
    val driver = spec.inputs.filter(in =>
      in.rows == chainRoot.rows && in.cols == chainRoot.cols &&
        isSparseSafe(chainRoot, covered, in))
      .sortBy(_.sparsity).headOption
      .getOrElse(spec.inputs.head)
    val rest = spec.inputs.filterNot(in => (in eq driver) || (in eq u) || (in eq v))
    val ordered = IndexedSeq(driver, u, v) ++ rest
    CPlan(OuterTpl, IndexedSeq(spec.root), covered, ordered,
      sparseSafe = true,
      rowVariant = None, outerVariant = Some(variant), cellAgg = None,
      maggFuncs = IndexedSeq.empty, rowDim = chainRoot.rows)
  }

  /** Merge k full-aggregate cell plans into one multi-aggregate CPlan. */
  def constructMultiAgg(specs: Seq[FusedSpec]): CPlan = {
    val cells = specs.map(constructCell)
    val main = cells.head.inputs.head
    val inputs = (main +: cells.flatMap(_.inputs).filterNot(_ eq main).distinct).toIndexedSeq
    CPlan(MAggTpl, specs.map(_.root).toIndexedSeq,
      specs.flatMap(_.covered.keys).toSet,
      inputs,
      sparseSafe = cells.forall(c => isSparseSafe(c.root.asInstanceOf[AggHop].in, c.covered, main)),
      rowVariant = None, outerVariant = None, cellAgg = None,
      maggFuncs = specs.map(_.root.asInstanceOf[AggHop].func).toIndexedSeq,
      rowDim = main.rows)
  }

  /** All covered hops reachable from `root` (root included if covered). */
  def coveredHops(root: Hop, covered: Set[Long]): Seq[Hop] = {
    val seen = scala.collection.mutable.LinkedHashSet[Hop]()
    def rec(h: Hop): Unit =
      if (covered.contains(h.id) && seen.add(h)) h.inputs.foreach(rec)
    rec(root)
    seen.toSeq
  }
}
