package repro.core

import java.util.concurrent.atomic.AtomicLong
import repro.runtime.Ops._

/** High-level operator (HOP) DAG IR — the input of the fusion optimizer.
  *
  * Nodes carry propagated matrix dimensions and sparsity estimates, which
  * the paper's optimizer relies on for template validity constraints and
  * costing (it runs after SystemML's dynamic rewrites, i.e., with known
  * sizes). Node identity is *reference* identity (unique `id`): a common
  * subexpression shared by two consumers is one node with two parents.
  */
sealed abstract class Hop extends Serializable {
  val id: Long = Hop.nextId()
  def inputs: IndexedSeq[Hop]
  def rows: Long
  def cols: Long
  /** Estimated fraction of non-zero cells in the output. */
  def sparsity: Double
  def name: String

  final def isScalar: Boolean = rows == 1 && cols == 1
  final def isVector: Boolean = rows == 1 || cols == 1
  final def numCells: Long = rows * cols
  /** Estimated non-zero count. */
  final def nnz: Long = math.ceil(sparsity * numCells).toLong

  override final def equals(o: Any): Boolean = o match {
    case h: Hop => h.id == id
    case _      => false
  }
  override final def hashCode: Int = id.toInt
  override def toString: String = s"$name#$id[${rows}x$cols,sp=${f"$sparsity%.4f"}]"
}

object Hop {
  private val counter = new AtomicLong(0)
  private[core] def nextId(): Long = counter.incrementAndGet()

  /** All nodes of the DAG rooted at `roots`, each visited once. */
  def collect(roots: Seq[Hop]): Seq[Hop] = {
    val seen = scala.collection.mutable.LinkedHashSet[Hop]()
    def rec(h: Hop): Unit = if (!seen.contains(h)) {
      h.inputs.foreach(rec)
      seen += h
    }
    roots.foreach(rec)
    seen.toSeq // topological: inputs before consumers
  }

  /** consumer-count per node over the DAG rooted at `roots`. */
  def consumers(roots: Seq[Hop]): Map[Long, Seq[Hop]] = {
    val nodes = collect(roots)
    val m = scala.collection.mutable.Map[Long, List[Hop]]().withDefaultValue(Nil)
    nodes.foreach(h => h.inputs.foreach(in => m(in.id) = h :: m(in.id)))
    m.toMap.withDefaultValue(Nil)
  }
}

/** Matrix (or scalar) input bound to materialized data at execution time. */
final class LeafHop(val leafName: String, val rows: Long, val cols: Long,
                    val sparsity: Double, val forceDistributed: Boolean = false) extends Hop {
  def inputs: IndexedSeq[Hop] = IndexedSeq.empty
  def name: String = s"leaf($leafName)"
}

/** Scalar literal. */
final class LitHop(val value: Double) extends Hop {
  def inputs: IndexedSeq[Hop] = IndexedSeq.empty
  def rows = 1L; def cols = 1L
  def sparsity: Double = if (value == 0.0) 0.0 else 1.0
  def name: String = s"lit($value)"
}

final class UnaryHop(val op: UnaryOp, val in: Hop) extends Hop {
  def inputs: IndexedSeq[Hop] = IndexedSeq(in)
  def rows: Long = in.rows
  def cols: Long = in.cols
  def sparsity: Double = if (op.sparseSafe) in.sparsity else 1.0
  def name: String = s"u(${op.name})"
}

final class BinaryHop(val op: BinaryOp, val left: Hop, val right: Hop) extends Hop {
  /** Scalar (1x1) left operand broadcasts against the right matrix. */
  val scalarLeft: Boolean = left.rows == 1 && left.cols == 1 && !(right.rows == 1 && right.cols == 1)
  // dims follow SystemML-style broadcasting; validated eagerly
  if (!scalarLeft)
    repro.runtime.LocalOps.broadcastSide(left.rows, left.cols, right.rows, right.cols)
  def inputs: IndexedSeq[Hop] = IndexedSeq(left, right)
  def rows: Long = if (scalarLeft) right.rows else left.rows
  def cols: Long = if (scalarLeft) right.cols else left.cols
  def sparsity: Double = op match {
    case Mult => left.sparsity * right.sparsity // independence assumption
    case Div  => left.sparsity
    case Plus | Minus => math.min(1.0, left.sparsity + right.sparsity)
    case _ => 1.0
  }
  def name: String = s"b(${op.name})"
}

final class MatMulHop(val left: Hop, val right: Hop) extends Hop {
  require(left.cols == right.rows, s"matmul dims: ${left.rows}x${left.cols} %*% ${right.rows}x${right.cols}")
  def inputs: IndexedSeq[Hop] = IndexedSeq(left, right)
  def rows: Long = left.rows
  def cols: Long = right.cols
  def sparsity: Double = // 1 - (1 - sl*sr)^k, SystemML's matmult estimator
    math.min(1.0, 1.0 - math.pow(1.0 - left.sparsity * right.sparsity, left.cols.toDouble))
  def name: String = "ba(+*)"
}

final class TransposeHop(val in: Hop) extends Hop {
  def inputs: IndexedSeq[Hop] = IndexedSeq(in)
  def rows: Long = in.cols
  def cols: Long = in.rows
  def sparsity: Double = in.sparsity
  def name: String = "t"
}

final class AggHop(val func: AggFunc, val dir: AggDir, val in: Hop) extends Hop {
  def inputs: IndexedSeq[Hop] = IndexedSeq(in)
  def rows: Long = dir match { case ColDir => 1L; case FullDir => 1L; case RowDir => in.rows }
  def cols: Long = dir match { case RowDir => 1L; case FullDir => 1L; case ColDir => in.cols }
  def sparsity: Double = 1.0
  def name: String = dir match {
    case FullDir => s"ua(${func.name})"
    case RowDir  => s"ua(R${func.name})"
    case ColDir  => s"ua(C${func.name})"
  }
}

/** Contiguous row range [from, toExcl) — used for mini-batching; not fusable. */
final class RowSliceHop(val in: Hop, val from: Long, val toExcl: Long) extends Hop {
  require(from >= 0 && toExcl <= in.rows && from < toExcl, s"slice [$from,$toExcl) of ${in.rows}")
  def inputs: IndexedSeq[Hop] = IndexedSeq(in)
  def rows: Long = toExcl - from
  def cols: Long = in.cols
  def sparsity: Double = in.sparsity
  def name: String = s"rix[$from:$toExcl]"
}
