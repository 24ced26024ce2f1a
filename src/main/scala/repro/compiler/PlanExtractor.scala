package repro.compiler

import scala.collection.mutable
import repro.core._
import repro.runtime.Ops._

/** Turns the memo table plus a set of materialization decisions into a
  * concrete execution plan: for every HOP whose output must exist, either
  * a basic operator or the best local fused operator (paper §4.3 "query
  * the memo table for the best fusion plan regarding template type and
  * fusion references").
  *
  * The heuristics of §4.1 are special cases of the materialized-edge set:
  * fuse-all = {} and fuse-no-redundancy = every multi-consumer dependency.
  */
object PlanExtractor {

  /** Rank of an entry when several cover a node: maximal fusion references
    * first, then template preference (Outer > Row > MAgg > Cell). */
  private def rank(e: MemoEntry): (Int, Int) = (e.countRefs, e.tpe.preference)

  /** Per-extraction memo of entry validity (avoids re-walking ref chains). */
  private type ValidCache = mutable.Map[(Long, MemoEntry), Boolean]

  def extract(dagRoots: Seq[Hop], memo: MemoTable, materialized: Set[(Long, Long)]): ExecPlan = {
    implicit val cache: ValidCache = mutable.Map.empty
    val produced = mutable.Map[Long, POp]()
    val stack = mutable.Stack[Hop](dagRoots: _*)

    while (stack.nonEmpty) {
      val h = stack.pop()
      if (!produced.contains(h.id) && !h.isInstanceOf[LeafHop] && !h.isInstanceOf[LitHop]) {
        chooseBest(h, memo, materialized) match {
          case Some(entry) =>
            val spec = expand(h, entry, memo, materialized)
            produced(h.id) = PFused(spec)
            spec.inputs.foreach(stack.push)
          case None =>
            produced(h.id) = PBasic(h)
            h.inputs.foreach(stack.push)
        }
      }
    }

    // topological order: producers before consumers
    val topoIdx = Hop.collect(dagRoots).zipWithIndex.map { case (h, i) => h.id -> i }.toMap
    val ordered = produced.values.toSeq.sortBy(op => op.outputs.map(o => topoIdx(o.id)).max)
    ExecPlan(mergeMultiAggs(ordered))
  }

  /** Best valid entry for starting an operator at `h` (open or closed).
    * A bare transpose never roots a fused operator — its entries exist
    * only to be merged into matmult patterns. */
  private def chooseBest(h: Hop, memo: MemoTable, mat: Set[(Long, Long)])
                        (implicit cache: ValidCache): Option[MemoEntry] = {
    if (h.isInstanceOf[TransposeHop]) return None
    val valid = memo.entries(h.id).filter(e => entryValid(h, e, memo, mat) &&
      // an open Outer entry without references covers only the outer-product
      // matmult itself — that is a basic operator, not a fused one
      !(e.tpe == OuterTpl && e.isOpen && !e.hasRefs))
    if (valid.isEmpty) None else Some(valid.maxBy(rank))
  }

  private def entryValid(h: Hop, e: MemoEntry, memo: MemoTable, mat: Set[(Long, Long)])
                        (implicit cache: ValidCache): Boolean =
    cache.getOrElseUpdate((h.id, e),
      e.refs.zipWithIndex.forall { case (r, j) =>
        r < 0 || (!mat.contains((h.id, r)) &&
          memo.entries(r).exists(s => s.isOpen && e.tpe.compatible.contains(s.tpe) &&
            entryValid(h.inputs(j), s, memo, mat)))
      })

  /** Best valid OPEN entry at `in` compatible with the parent template. */
  private def chooseCompatOpen(in: Hop, parent: TemplateType, memo: MemoTable,
                               mat: Set[(Long, Long)])
                              (implicit cache: ValidCache): Option[MemoEntry] = {
    val valid = memo.entries(in.id).filter(e =>
      e.isOpen && parent.compatible.contains(e.tpe) && entryValid(in, e, memo, mat))
    if (valid.isEmpty) None else Some(valid.maxBy(rank))
  }

  /** Expand the fused operator rooted at (h, entry): follow fusion
    * references top-down, collecting covered nodes and materialized inputs. */
  private def expand(h: Hop, entry: MemoEntry, memo: MemoTable, mat: Set[(Long, Long)])
                    (implicit cache: ValidCache): FusedSpec = {
    val covered = mutable.LinkedHashMap[Long, MemoEntry]()
    val inputs = mutable.LinkedHashSet[Hop]()

    def rec(hop: Hop, e: MemoEntry): Unit = {
      covered(hop.id) = e
      // the transposed factor of an Outer opening matmult is part of the
      // pattern: the skeleton reads V's rows directly, never t(V)
      val absorbed: Option[Hop] = hop match {
        case m: MatMulHop if e.tpe == OuterTpl && TemplateType.isOuterMatMul(m) &&
          !covered.contains(m.right.id) =>
          val t = m.right.asInstanceOf[TransposeHop]
          covered(t.id) = e
          inputs += t.in
          Some(t)
        case _ => None
      }
      hop.inputs.zipWithIndex.foreach { case (in, j) =>
        if (!absorbed.exists(_ eq in)) {
          val fusedHere = e.refs(j) >= 0 && !mat.contains((hop.id, in.id)) && !covered.contains(in.id)
          val sub = if (fusedHere) chooseCompatOpen(in, e.tpe, memo, mat) else None
          if (covered.contains(in.id)) () // diamond inside the fused operator
          else sub match {
            case Some(s) => rec(in, s)
            case None    => inputs += in
          }
        }
      }
    }
    rec(h, entry)
    FusedSpec(h, entry.tpe, covered.toMap, inputs.toIndexedSeq)
  }

  /** Merge adjacent full aggregates with shared inputs into multi-aggregate
    * operators (paper Fig. 1(c)): one scan over the shared input. */
  private def mergeMultiAggs(ops: Seq[POp]): Seq[POp] = {
    def isFullAggOp(op: POp): Option[FusedSpec] = op match {
      case PFused(s) =>
        s.root match {
          case a: AggHop if a.dir == FullDir &&
            (s.tpe == MAggTpl || s.tpe == CellTpl) => Some(s)
          case _ => None
        }
      case _ => None
    }
    val result = mutable.ArrayBuffer[POp]()
    val pending = mutable.ArrayBuffer[FusedSpec]()
    val mergedAt = mutable.Map[Int, mutable.ArrayBuffer[FusedSpec]]()

    ops.foreach { op =>
      isFullAggOp(op) match {
        case Some(spec) =>
          // group with an earlier aggregate sharing any input (max 3 per
          // group); chains must have identical dims to share one cell scan
          def dims(s: FusedSpec) = { val in = s.root.asInstanceOf[AggHop].in; (in.rows, in.cols) }
          val grp = mergedAt.values.find(g =>
            g.size < 3 && dims(g.head) == dims(spec) &&
              g.exists(_.inputs.exists(i => spec.inputs.exists(_ eq i))))
          grp match {
            case Some(g) => g += spec
            case None =>
              val g = mutable.ArrayBuffer(spec)
              mergedAt(result.size) = g
              result += null // placeholder, filled below
          }
          pending += spec
        case None =>
          result += op
      }
    }
    result.indices.foreach { i =>
      if (result(i) == null) {
        val g = mergedAt(i)
        result(i) = if (g.size == 1) PFused(g.head) else PMultiAgg(g.toSeq)
      }
    }
    result.toSeq
  }
}
