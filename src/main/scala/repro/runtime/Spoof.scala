package repro.runtime

import repro.compiler._
import repro.runtime.Ops._

/** Hand-coded skeletons of fused operators (paper §2.2 "Runtime
  * Integration", Fig. 4). The skeleton owns the data access — dense,
  * sparse, or compressed, cells or non-zeros depending on sparse-safety —
  * and calls the generated `genexec` per value/row. Generated operators
  * are Java classes produced by [[repro.compiler.Codegen]] (compiled
  * in-memory); the skeleton + shared [[VectorPrims]] keep the
  * per-operator instruction footprint small.
  *
  * Each skeleton executes one local [[MatrixBlock]]; the distributed
  * runtime invokes the same skeletons per row-block inside `mapGroups`
  * and combines partial aggregates.
  */
object Spoof {
  /** Broadcast-aware side-input access (used by the closure fallback). */
  def getValue(side: MatrixBlock, rix: Int, cix: Int): Double =
    if (side.rows == 1 && side.cols == 1) side.get(0, 0)
    else if (side.cols == 1) side.get(rix, 0)
    else if (side.rows == 1) side.get(0, cix)
    else side.get(rix, cix)

  /** Densify side inputs for O(1) access (stateless getValue over sparse
    * blocks would degrade to row scans; the paper uses stateful iterators). */
  def prepSides(inputs: IndexedSeq[MatrixBlock]): Array[MatrixBlock] = {
    val out = new Array[MatrixBlock](inputs.length)
    var i = 0
    while (i < out.length) {
      out(i) = inputs(i) match {
        case s: SparseBlock if i > 0 => s.toDense
        case b => b
      }
      i += 1
    }
    out
  }
}

sealed trait SpoofOperator extends Serializable {
  def name: String
  /** Execute over local blocks; inputs ordered as in the CPlan (main first). */
  def execute(inputs: IndexedSeq[MatrixBlock]): IndexedSeq[MatrixBlock]
}

/** Cell template skeleton: iterates cells (or non-zeros when sparse-safe;
  * or dictionary entries of compressed inputs) of the main input. */
final class SpoofCellwise(
    val name: String,
    val agg: Option[(AggFunc, AggDir)],
    val sparseSafe: Boolean,
    val exec: ExecRef[CellExec],
) extends SpoofOperator {

  def execute(inputs0: IndexedSeq[MatrixBlock]): IndexedSeq[MatrixBlock] =
    IndexedSeq(executeSingle(inputs0))

  def executeSingle(inputs0: IndexedSeq[MatrixBlock]): MatrixBlock = {
    val inputs = Spoof.prepSides(inputs0)
    val gx = exec.get
    inputs(0) match {
      case c: CompressedBlock if inputs.length == 1 && compressedFastPath =>
        executeCompressed(gx, c, inputs)
      case c: CompressedBlock =>
        val repl = inputs.clone(); repl(0) = c.toDense
        executeGeneric(gx, repl)
      case s: SparseBlock if sparseSafe => executeSparse(gx, s, inputs)
      case _ => executeGeneric(gx, inputs)
    }
  }

  /** Single input + additive aggregation: execute once per distinct
    * dictionary value, weighted by its count (paper §5.2 CLA). */
  private def compressedFastPath: Boolean = agg match {
    case Some((SumAgg, FullDir)) | Some((SumAgg, ColDir)) => true
    case _ => false
  }

  private def executeCompressed(gx: CellExec, c: CompressedBlock, inputs: Array[MatrixBlock]): MatrixBlock = agg match {
    case Some((SumAgg, FullDir)) =>
      var acc = 0.0
      var j = 0
      while (j < c.cols) {
        val g = c.groups(j)
        var d = 0
        while (d < g.dict.length) { acc += gx.genexec(g.dict(d), inputs, 0, j) * g.counts(d); d += 1 }
        j += 1
      }
      MatrixBlock.dense(1, 1, Array(acc))
    case Some((SumAgg, ColDir)) =>
      val out = new Array[Double](c.cols)
      var j = 0
      while (j < c.cols) {
        val g = c.groups(j)
        var d = 0
        while (d < g.dict.length) { out(j) += gx.genexec(g.dict(d), inputs, 0, j) * g.counts(d); d += 1 }
        j += 1
      }
      MatrixBlock.dense(1, c.cols, out)
    case _ => throw new IllegalStateException("unsupported compressed agg")
  }

  private def executeSparse(gx: CellExec, s: SparseBlock, inputs: Array[MatrixBlock]): MatrixBlock = agg match {
    case None =>
      val vals = new Array[Double](s.vals.length)
      var i = 0
      while (i < s.rows) {
        var p = s.rowPtr(i)
        while (p < s.rowPtr(i + 1)) { vals(p) = gx.genexec(s.vals(p), inputs, i, s.colIdx(p)); p += 1 }
        i += 1
      }
      new SparseBlock(s.rows, s.cols, s.rowPtr, s.colIdx, vals)
    case Some((f, dir)) =>
      dir match {
        case FullDir =>
          var acc = f.init
          var i = 0
          while (i < s.rows) {
            var q = s.rowPtr(i)
            while (q < s.rowPtr(i + 1)) { acc = f(acc, gx.genexec(s.vals(q), inputs, i, s.colIdx(q))); q += 1 }
            i += 1
          }
          // pseudo-sparse-safe aggregation: min/max observe implicit zeros
          if (f != SumAgg && s.nnz < s.numCells) acc = f(acc, 0.0)
          MatrixBlock.dense(1, 1, Array(acc))
        case RowDir =>
          val out = new Array[Double](s.rows)
          if (f != SumAgg) java.util.Arrays.fill(out, f.init)
          var i = 0
          while (i < s.rows) {
            var q = s.rowPtr(i)
            while (q < s.rowPtr(i + 1)) { out(i) = f(out(i), gx.genexec(s.vals(q), inputs, i, s.colIdx(q))); q += 1 }
            if (f != SumAgg && s.rowPtr(i + 1) - s.rowPtr(i) < s.cols) out(i) = f(out(i), 0.0)
            i += 1
          }
          MatrixBlock.dense(s.rows, 1, out)
        case ColDir =>
          val out = new Array[Double](s.cols)
          if (f != SumAgg) java.util.Arrays.fill(out, f.init)
          var i = 0
          while (i < s.rows) {
            var q = s.rowPtr(i)
            while (q < s.rowPtr(i + 1)) {
              val cix = s.colIdx(q)
              out(cix) = f(out(cix), gx.genexec(s.vals(q), inputs, i, cix))
              q += 1
            }
            i += 1
          }
          if (f != SumAgg && s.nnz < s.numCells) {
            var c = 0
            while (c < s.cols) { out(c) = f(out(c), 0.0); c += 1 }
          }
          MatrixBlock.dense(1, s.cols, out)
      }
  }

  private def executeGeneric(gx: CellExec, inputs: Array[MatrixBlock]): MatrixBlock = {
    val main = inputs(0).toDense
    val mv = main.values
    val n = main.rows; val m = main.cols
    agg match {
      case None =>
        val out = new Array[Double](n * m)
        var i = 0
        while (i < n) {
          var j = 0
          val off = i * m
          while (j < m) { out(off + j) = gx.genexec(mv(off + j), inputs, i, j); j += 1 }
          i += 1
        }
        new DenseBlock(n, m, out)
      case Some((f, FullDir)) =>
        var acc = f.init
        var i = 0
        while (i < n) {
          var j = 0
          val off = i * m
          while (j < m) { acc = f(acc, gx.genexec(mv(off + j), inputs, i, j)); j += 1 }
          i += 1
        }
        MatrixBlock.dense(1, 1, Array(acc))
      case Some((f, RowDir)) =>
        val out = new Array[Double](n)
        var i = 0
        while (i < n) {
          var acc = f.init
          var j = 0
          val off = i * m
          while (j < m) { acc = f(acc, gx.genexec(mv(off + j), inputs, i, j)); j += 1 }
          out(i) = acc
          i += 1
        }
        MatrixBlock.dense(n, 1, out)
      case Some((f, ColDir)) =>
        val out = new Array[Double](m)
        if (f != SumAgg) java.util.Arrays.fill(out, f.init)
        var i = 0
        while (i < n) {
          var j = 0
          val off = i * m
          while (j < m) { out(j) = f(out(j), gx.genexec(mv(off + j), inputs, i, j)); j += 1 }
          i += 1
        }
        MatrixBlock.dense(1, m, out)
    }
  }
}

/** Multi-aggregate skeleton: k full aggregates over shared inputs computed
  * in one pass over the main input; output is 1 x k. */
final class SpoofMultiAgg(
    val name: String,
    val funcs: IndexedSeq[AggFunc],
    val sparseSafe: Boolean,
    val execs: IndexedSeq[ExecRef[CellExec]],
) extends SpoofOperator {

  def execute(inputs0: IndexedSeq[MatrixBlock]): IndexedSeq[MatrixBlock] = {
    val out = executeSingle(inputs0)
    (0 until funcs.length).map(k => MatrixBlock.dense(1, 1, Array(out.get(0, k))))
  }

  def executeSingle(inputs0: IndexedSeq[MatrixBlock]): MatrixBlock = {
    val inputs = Spoof.prepSides(inputs0)
    val gxs = execs.map(_.get).toArray
    val fns = funcs.toArray
    val acc = fns.map(_.init)
    inputs(0) match {
      case s: SparseBlock if sparseSafe =>
        var i = 0
        while (i < s.rows) {
          var q = s.rowPtr(i)
          while (q < s.rowPtr(i + 1)) {
            var k = 0
            while (k < acc.length) { acc(k) = fns(k)(acc(k), gxs(k).genexec(s.vals(q), inputs, i, s.colIdx(q))); k += 1 }
            q += 1
          }
          i += 1
        }
        if (s.nnz < s.numCells) {
          var k = 0
          while (k < acc.length) { if (fns(k) != SumAgg) acc(k) = fns(k)(acc(k), 0.0); k += 1 }
        }
      case m0 =>
        val d = m0.toDense
        val dv = d.values
        var i = 0
        while (i < d.rows) {
          var j = 0
          val off = i * d.cols
          while (j < d.cols) {
            val a = dv(off + j)
            var k = 0
            while (k < acc.length) { acc(k) = fns(k)(acc(k), gxs(k).genexec(a, inputs, i, j)); k += 1 }
            j += 1
          }
          i += 1
        }
    }
    MatrixBlock.dense(1, acc.length, acc)
  }
}

/** Row template skeleton: iterates (dense or densified sparse) rows of the
  * main input; the generated row program returns a row vector or scalar,
  * accumulated according to the row variant. */
final class SpoofRowwise(
    val name: String,
    val variant: RowVariant,
    val exec: ExecRef[RowExec],
) extends SpoofOperator {

  def execute(inputs0: IndexedSeq[MatrixBlock]): IndexedSeq[MatrixBlock] =
    IndexedSeq(executeSingle(inputs0))

  /** Output dimensions are taken from the first row's result — generated
    * operators are shape-generic and shared across data sizes. */
  def executeSingle(inputs0: IndexedSeq[MatrixBlock]): MatrixBlock = {
    val inputs = new Array[MatrixBlock](inputs0.length)
    var k = 0
    while (k < inputs.length) {
      inputs(k) = inputs0(k) match {
        // densify non-main sides except large row-aligned sparse matrices
        case s: SparseBlock if k > 0 && s.numCells <= (1L << 24) => s.toDense
        case b => b
      }
      k += 1
    }
    val gx = exec.get
    val main = inputs(0)
    val n = main.rows
    require(n > 0, "empty row block")
    val row = new Array[Double](main.cols) // reused row buffer
    variant match {
      case RowNoAgg =>
        main.copyRow(0, row)
        val r0 = gx.genexecVec(row, inputs, 0)
        val outCols = r0.length
        val out = new Array[Double](n * outCols)
        System.arraycopy(r0, 0, out, 0, outCols)
        var i = 1
        while (i < n) {
          main.copyRow(i, row)
          val r = gx.genexecVec(row, inputs, i)
          System.arraycopy(r, 0, out, i * outCols, outCols)
          i += 1
        }
        new DenseBlock(n, outCols, out)
      case RowRowAgg =>
        val out = new Array[Double](n)
        var i = 0
        while (i < n) {
          main.copyRow(i, row)
          out(i) = gx.genexecScalar(row, inputs, i)
          i += 1
        }
        MatrixBlock.dense(n, 1, out)
      case RowColAgg =>
        main.copyRow(0, row)
        val out = gx.genexecVec(row, inputs, 0).clone()
        var i = 1
        while (i < n) {
          main.copyRow(i, row)
          VectorPrims.vectAdd(gx.genexecVec(row, inputs, i), out)
          i += 1
        }
        MatrixBlock.dense(1, out.length, out)
      case RowFullAgg =>
        var acc = 0.0
        var i = 0
        while (i < n) {
          main.copyRow(i, row)
          acc += gx.genexecScalar(row, inputs, i)
          i += 1
        }
        MatrixBlock.dense(1, 1, Array(acc))
      case RowColAggT =>
        main.copyRow(0, row)
        val x0 = gx.genexecVec2(row, inputs, 0)
        val outRows = x0.length
        val xCopy = x0.clone() // z-side evaluation may reuse buffers
        val z0 = gx.genexecVec(row, inputs, 0)
        val outCols = z0.length
        val out = new Array[Double](outRows * outCols)
        VectorPrims.vectOuterMultAdd(xCopy, z0, out, 0, outRows, outCols)
        var i = 1
        while (i < n) {
          main.copyRow(i, row)
          System.arraycopy(gx.genexecVec2(row, inputs, i), 0, xCopy, 0, outRows)
          val z = gx.genexecVec(row, inputs, i)
          VectorPrims.vectOuterMultAdd(xCopy, z, out, 0, outRows, outCols)
          i += 1
        }
        new DenseBlock(outRows, outCols, out)
    }
  }
}

/** Outer-product template skeleton: iterates (non-zero) cells of the
  * driver X with row access to the factors U and V (paper Fig. 3(a)). */
final class SpoofOuterProduct(
    val name: String,
    val variant: OuterVariant,
    /** Index of the closing matmult's other operand W in the inputs (MM variants). */
    val wIdx: Int,
    val exec: ExecRef[OuterExec],
) extends SpoofOperator {

  def execute(inputs0: IndexedSeq[MatrixBlock]): IndexedSeq[MatrixBlock] =
    IndexedSeq(executeSingle(inputs0))

  def executeSingle(inputs0: IndexedSeq[MatrixBlock]): MatrixBlock = {
    val inputs: Array[MatrixBlock] = inputs0.toArray
    val gx = exec.get
    val x = inputs(0)
    val u = inputs(1).toDense
    val v = inputs(2).toDense
    val w = if (wIdx >= 0) inputs(wIdx).toDense else null

    // sparse driver + NO_AGG: the sparse-safe chain keeps X's pattern —
    // never allocate the dense n x m output
    x match {
      case s: SparseBlock if variant == OuterNoAgg =>
        val vals = new Array[Double](s.vals.length)
        var i = 0
        while (i < s.rows) {
          var p = s.rowPtr(i)
          while (p < s.rowPtr(i + 1)) {
            vals(p) = gx.genexec(s.vals(p), u.values, v.values, inputs, i, s.colIdx(p))
            p += 1
          }
          i += 1
        }
        return new SparseBlock(s.rows, s.cols, s.rowPtr, s.colIdx, vals)
      case _ =>
    }

    var out: Array[Double] = null
    var outRows = 0; var outCols = 0
    var acc = 0.0
    variant match {
      case OuterFullAgg =>
      case OuterRightMM => outRows = x.rows; outCols = w.cols; out = new Array[Double](outRows * outCols)
      case OuterLeftMM  => outRows = x.cols; outCols = w.cols; out = new Array[Double](outRows * outCols)
      case OuterNoAgg   => outRows = x.rows; outCols = x.cols; out = new Array[Double](outRows * outCols)
    }

    @inline def process(i: Int, j: Int, xij: Double): Unit = {
      val res = gx.genexec(xij, u.values, v.values, inputs, i, j)
      variant match {
        case OuterFullAgg => acc += res
        case OuterRightMM => VectorPrims.vectMultAdd(w.values, res, out, j * w.cols, i * outCols, w.cols)
        case OuterLeftMM  => VectorPrims.vectMultAdd(w.values, res, out, i * w.cols, j * outCols, w.cols)
        case OuterNoAgg   => out(i * outCols + j) = res
      }
    }

    x match {
      case s: SparseBlock =>
        var i = 0
        while (i < s.rows) {
          var p = s.rowPtr(i)
          while (p < s.rowPtr(i + 1)) { process(i, s.colIdx(p), s.vals(p)); p += 1 }
          i += 1
        }
      case d =>
        val dd = d.toDense
        var i = 0
        while (i < dd.rows) {
          var j = 0
          while (j < dd.cols) { process(i, j, dd.values(i * dd.cols + j)); j += 1 }
          i += 1
        }
    }

    variant match {
      case OuterFullAgg => MatrixBlock.dense(1, 1, Array(acc))
      case _            => new DenseBlock(outRows, outCols, out)
    }
  }
}
