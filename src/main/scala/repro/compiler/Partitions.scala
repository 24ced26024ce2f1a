package repro.compiler

import scala.collection.mutable
import repro.core._

/** An interesting point (paper §4.2): a boolean materialization decision on
  * the data dependency consumer -> target. `true` means materialize —
  * all partial fusion plans with a reference from consumer to target
  * become invalid. Template switches are flagged separately. */
final case class InterestingPoint(consumer: Long, target: Long, isSwitch: Boolean) {
  def edge: (Long, Long) = (consumer, target)
  override def toString: String = s"($consumer->$target${if (isSwitch) ",sw" else ""})"
}

/** A plan partition: a connected component of partial fusion plans in
  * terms of fusion references (paper §4.2). Partitions are optimized and
  * costed independently. */
final case class PlanPartition(
    nodes: Set[Long],
    roots: Set[Long],      // nodes never referenced from within the partition
    inputs: Set[Long],     // hop ids read by partition nodes but outside it
    matPoints: Set[Long],  // nodes with multiple consumers (minus roots)
    points: IndexedSeq[InterestingPoint],
)

object Partitions {

  /** Analyze the memo table into independent plan partitions with their
    * interesting materialization points and template switches. */
  def analyze(dagRoots: Seq[Hop], memo: MemoTable): Seq[PlanPartition] = {
    val groupIds = memo.groupIds.toSet
    if (groupIds.isEmpty) return Seq.empty
    val consumers = Hop.consumers(dagRoots)

    // connected components over fusion references (union-find)
    val parent = mutable.Map[Long, Long]()
    def find(x: Long): Long = {
      var r = x
      while (parent.getOrElse(r, r) != r) r = parent(r)
      parent(x) = r
      r
    }
    def union(a: Long, b: Long): Unit = { val ra = find(a); val rb = find(b); if (ra != rb) parent(ra) = rb }
    groupIds.foreach(id => parent.getOrElseUpdate(id, id))
    for (id <- groupIds; e <- memo.entries(id); r <- e.refs if r >= 0)
      union(id, r)

    val comps = groupIds.groupBy(find).values.toSeq

    comps.map { nodes =>
      val refTargets = (for (id <- nodes; e <- memo.entries(id); r <- e.refs if r >= 0) yield r).toSet
      val roots = nodes -- refTargets
      val inputs = (for (id <- nodes; in <- memo.hop(id).inputs if !nodes.contains(in.id)) yield in.id).toSet
      val matPoints = nodes.filter(id => consumers(id).size > 1) -- roots

      val pts = mutable.LinkedHashSet[InterestingPoint]()
      // (1) materialization point consumers: per data dependency
      for (m <- matPoints.toSeq.sorted; g <- consumers(m).sortBy(_.id))
        if (nodes.contains(g.id) && memo.entries(g.id).exists(_.refs.contains(m)))
          pts += InterestingPoint(g.id, m, isSwitch = false)
      // (2) template switches: dependency g -> j where W[j] has types not in W[g]
      for (g <- nodes.toSeq.sorted; in <- memo.hop(g).inputs if nodes.contains(in.id)) {
        val tg = memo.templates(g).toSet
        val tj = memo.templates(in.id).toSet
        if ((tj -- tg).nonEmpty && memo.entries(g).exists(_.refs.contains(in.id)))
          pts += InterestingPoint(g, in.id, isSwitch = true)
      }
      // dedupe by edge (a switch that is also a mat-point consumer counts once)
      val dedup = pts.toSeq.distinctBy(_.edge).toIndexedSeq

      PlanPartition(nodes, roots, inputs, matPoints, dedup)
    }
  }

  /** Is hop `b` reachable from hop `a` following inputs (a is an ancestor)? */
  def reaches(a: Hop, bId: Long, within: Set[Long]): Boolean = {
    val seen = mutable.Set[Long]()
    def rec(h: Hop): Boolean = {
      if (h.id == bId) true
      else if (!seen.add(h.id)) false
      else h.inputs.exists(in => (within.contains(in.id) || in.id == bId) && rec(in))
    }
    a.inputs.exists(in => (within.contains(in.id) || in.id == bId) && rec(in))
  }
}
