package repro.compiler

import java.util.concurrent.atomic.AtomicLong
import scala.collection.concurrent.TrieMap
import scala.collection.mutable
import repro.core._
import repro.runtime._
import repro.runtime.Ops._

/** Code generation statistics (paper Table 3): compiled DAGs, constructed
  * CPlans, compiled operators, plan-cache hits, and compile overhead. */
object CodegenStats {
  val dagsOptimized      = new AtomicLong
  val cplansConstructed  = new AtomicLong
  val operatorsCompiled  = new AtomicLong
  val planCacheHits      = new AtomicLong
  val codegenNanos       = new AtomicLong // total codegen step (construct + compile)
  val compileNanos       = new AtomicLong // operator class compilation only
  val plansEvaluated     = new AtomicLong // costed plans in MPSkipEnum
  val plansSkipped       = new AtomicLong // pruned plans in MPSkipEnum

  def reset(): Unit = Seq(dagsOptimized, cplansConstructed, operatorsCompiled,
    planCacheHits, codegenNanos, compileNanos, plansEvaluated, plansSkipped).foreach(_.set(0))

  def summary: String =
    f"dags=${dagsOptimized.get} cplans=${cplansConstructed.get} compiled=${operatorsCompiled.get} " +
      f"cacheHits=${planCacheHits.get} codegen=${codegenNanos.get / 1e6}%.1fms " +
      f"compile=${compileNanos.get / 1e6}%.1fms plansEval=${plansEvaluated.get} plansSkipped=${plansSkipped.get}"
}

/** Compiles CPlans into executable fused operators.
  *
  * Primary backend: per-operator Java source generation compiled in
  * memory with the JDK compiler (the paper's javac path, §2.1/Fig. 11 —
  * janino is not available offline). Generated classes only override the
  * template's `genexec`; data access, multi-threading and aggregation
  * live in the hand-coded skeletons ([[repro.runtime.SpoofCellwise]] et
  * al.). A closure-based interpreter serves as fallback when no system
  * compiler exists. The plan cache identifies equivalent CPlans via
  * structural keys to avoid re-compilation across DAGs and dynamic
  * recompilation (paper §2.1, §5.3).
  */
object Codegen {

  private val planCache = TrieMap[String, SpoofOperator]()

  def cacheSize: Int = planCache.size
  def clearCache(): Unit = planCache.clear()

  /** Force the closure fallback (tests / environments without a JDK). */
  @volatile var forceClosureBackend: Boolean = false
  def javaBackendActive: Boolean = !forceClosureBackend && JavaBackend.available

  def compile(cplan: CPlan): SpoofOperator = {
    val key = cplan.structuralKey
    planCache.get(key) match {
      case Some(op) =>
        CodegenStats.planCacheHits.incrementAndGet()
        op
      case None =>
        val t0 = System.nanoTime()
        val op = doCompile(cplan)
        CodegenStats.compileNanos.addAndGet(System.nanoTime() - t0)
        CodegenStats.operatorsCompiled.incrementAndGet()
        planCache.putIfAbsent(key, op)
        op
    }
  }

  private def className(cplan: CPlan): String = {
    val md = java.security.MessageDigest.getInstance("MD5")
      .digest(cplan.structuralKey.getBytes("UTF-8"))
    "GenOp" + md.take(8).map(b => f"$b%02x").mkString
  }

  private def doCompile(cplan: CPlan): SpoofOperator = {
    val name = className(cplan)
    cplan.tpe match {
      case CellTpl =>
        new SpoofCellwise(name, cplan.cellAgg, cplan.sparseSafe, cellExec(name, cplan, chainRootOf(cplan)))
      case MAggTpl =>
        val execs = cplan.roots.zipWithIndex.map { case (r, k) =>
          cellExec(s"${name}_$k", cplan, r.asInstanceOf[AggHop].in)
        }
        new SpoofMultiAgg(name, cplan.maggFuncs, cplan.sparseSafe, execs)
      case RowTpl   => compileRow(name, cplan)
      case OuterTpl => compileOuter(name, cplan)
    }
  }

  private def chainRootOf(cplan: CPlan): Hop = cplan.root match {
    case a: AggHop => a.in
    case h         => h
  }

  private def inputIndex(h: Hop, cplan: CPlan): Int = {
    val idx = cplan.inputs.indexWhere(_ eq h)
    if (idx < 0) throw new IllegalStateException(s"input $h not bound in CPlan inputs ${cplan.inputs}")
    idx
  }

  private def lit(v: Double): String =
    if (v.isNaN) "Double.NaN"
    else if (v == Double.PositiveInfinity) "Double.POSITIVE_INFINITY"
    else if (v == Double.NegativeInfinity) "Double.NEGATIVE_INFINITY"
    else v.toString

  private def unaryJava(op: UnaryOp, x: String): String = op match {
    case Exp     => s"Math.exp($x)"
    case Log     => s"Math.log($x)"
    case Sqrt    => s"Math.sqrt($x)"
    case Abs     => s"Math.abs($x)"
    case Sign    => s"Math.signum($x)"
    case Neg     => s"(-$x)"
    case Sigmoid => s"(1.0 / (1.0 + Math.exp(-$x)))"
    case Neq0    => s"(($x != 0.0) ? 1.0 : 0.0)"
    case Pow2    => s"($x * $x)"
  }

  private def binaryJava(op: BinaryOp, x: String, y: String): String = op match {
    case Plus  => s"($x + $y)"
    case Minus => s"($x - $y)"
    case Mult  => s"($x * $y)"
    case Div   => s"($x / $y)"
    case Pow   => s"Math.pow($x, $y)"
    case MinOp => s"Math.min($x, $y)"
    case MaxOp => s"Math.max($x, $y)"
    case Neq   => s"(($x != $y) ? 1.0 : 0.0)"
    case Eq    => s"(($x == $y) ? 1.0 : 0.0)"
    case Gt    => s"(($x > $y) ? 1.0 : 0.0)"
    case Lt    => s"(($x < $y) ? 1.0 : 0.0)"
    case Ge    => s"(($x >= $y) ? 1.0 : 0.0)"
    case Le    => s"(($x <= $y) ? 1.0 : 0.0)"
  }

  private final class Src(val prefix: String = "") {
    val body = new StringBuilder
    val fields = new StringBuilder
    private var n = 0
    val memo = mutable.Map[Long, String]() // hop id -> local var (CSE inside the operator)
    def fresh(): String = { n += 1; s"${prefix}TMP$n" }
    def line(s: String): Unit = body.append("    ").append(s).append('\n')
    /** A vector temporary backed by a reused instance field (the paper's
      * per-thread ring buffer for row intermediates). */
    def buf(lenExpr: String): String = {
      val t = fresh()
      fields.append(s"  private double[] ${t}F;\n")
      line(s"if (${t}F == null || ${t}F.length != ($lenExpr)) ${t}F = new double[$lenExpr];")
      line(s"double[] $t = ${t}F;")
      t
    }
  }

  private def header(name: String, parent: String): String =
    s"""package repro.codegen;
       |import repro.runtime.MatrixBlock;
       |import repro.runtime.VectorPrims;
       |public final class $name extends repro.runtime.$parent {
       |""".stripMargin

  // ---------------------------------------------------------------- Cell

  private def cellExec(name: String, cplan: CPlan, chainRoot: Hop): ExecRef[CellExec] = {
    if (!javaBackendActive)
      return ExecRef.direct(new FnCellExec(cellFn(chainRoot, cplan)))
    val src = new Src
    val root = emitCell(chainRoot, cplan, src)
    val source = header(name, "CellExec") +
      "  public double genexec(double a, MatrixBlock[] b, int rix, int cix) {\n" +
      src.body.toString +
      s"    return $root;\n  }\n}\n"
    ExecRef.compiled(JavaBackend.instance(name, source).asInstanceOf[CellExec], name, source)
  }

  /** Emit SSA-style Java for a cell chain; returns the value expression. */
  private def emitCell(h: Hop, cplan: CPlan, src: Src): String = {
    val main = cplan.inputs(0)
    if (h eq main) return "a"
    src.memo.get(h.id).foreach(return _)
    val v =
      if (!cplan.covered.contains(h.id)) {
        val k = inputIndex(h, cplan)
        val t = src.fresh()
        src.line(s"double $t = b[$k].get(${sideIdx(h)});")
        t
      }
      else h match {
        case u: UnaryHop =>
          val x = emitCell(u.in, cplan, src)
          val t = src.fresh()
          src.line(s"double $t = ${unaryJava(u.op, x)};")
          t
        case bin: BinaryHop =>
          val x = emitCell(bin.left, cplan, src)
          val y = emitCell(bin.right, cplan, src)
          val t = src.fresh()
          src.line(s"double $t = ${binaryJava(bin.op, x, y)};")
          t
        case _ => throw new IllegalStateException(s"unsupported hop in Cell chain: $h")
      }
    src.memo(h.id) = v
    v
  }

  /** Broadcast-resolved (rix, cix) access for a side input. */
  private def sideIdx(h: Hop): String =
    if (h.rows == 1 && h.cols == 1) "0, 0"
    else if (h.cols == 1) "rix, 0"
    else if (h.rows == 1) "0, cix"
    else "rix, cix"

  // ----------------------------------------------------------------- Row

  /** Static value kind of a Row-chain node: per-row scalar or row vector
    * of a statically known length. */
  private def rowIsScalar(h: Hop, cplan: CPlan): Boolean =
    h.cols == 1 || (h.rows == 1 && h.cols == 1)

  private def compileRow(name: String, cplan: CPlan): SpoofRowwise = {
    val variant = cplan.rowVariant.get
    if (!javaBackendActive) return compileRowClosure(name, cplan, variant)
    val root = cplan.root

    val allFields = new StringBuilder
    def vecMethod(method: String, h: Hop): String = {
      val src = new Src(if (method == "genexecVec2") "X" else "Z")
      val r = emitRowVec(h, cplan, src)
      allFields.append(src.fields)
      s"  public double[] $method(double[] a, MatrixBlock[] b, int rix) {\n" +
        src.body.toString + s"    return $r;\n  }\n"
    }
    def scalarMethod(h: Hop): String = {
      val src = new Src("S")
      val r = emitRow(h, cplan, src) match {
        case Left(vecV) => // vector chain under a full aggregate
          val t = src.fresh()
          src.line(s"double $t = VectorPrims.vectSum($vecV);")
          t
        case Right(s) => s
      }
      allFields.append(src.fields)
      s"  public double genexecScalar(double[] a, MatrixBlock[] b, int rix) {\n" +
        src.body.toString + s"    return $r;\n  }\n"
    }

    val methods = variant match {
      case RowNoAgg  => vecMethod("genexecVec", root)
      case RowColAgg => vecMethod("genexecVec", root.asInstanceOf[AggHop].in)
      case RowFullAgg => scalarMethod(root.asInstanceOf[AggHop].in)
      case RowRowAgg =>
        val in = root match { case a: AggHop => a.in; case h => h }
        root match {
          case a: AggHop if !rowIsScalar(in, cplan) =>
            // aggregate a row vector with the agg function
            val src = new Src("S")
            val vecV = emitRowVec(in, cplan, src)
            val t = src.fresh()
            a.func match {
              case SumAgg => src.line(s"double $t = VectorPrims.vectSum($vecV);")
              case MinAgg =>
                src.line(s"double $t = Double.POSITIVE_INFINITY;")
                src.line(s"for (int i_ = 0; i_ < $vecV.length; i_++) $t = Math.min($t, $vecV[i_]);")
              case MaxAgg =>
                src.line(s"double $t = Double.NEGATIVE_INFINITY;")
                src.line(s"for (int i_ = 0; i_ < $vecV.length; i_++) $t = Math.max($t, $vecV[i_]);")
            }
            allFields.append(src.fields)
            s"  public double genexecScalar(double[] a, MatrixBlock[] b, int rix) {\n" +
              src.body.toString + s"    return $t;\n  }\n"
          case _ => scalarMethod(in)
        }
      case RowColAggT =>
        val m = root.asInstanceOf[MatMulHop]
        vecMethod("genexecVec2", m.left) + vecMethod("genexecVec", m.right)
    }
    val source = header(name, "RowExec") + allFields.toString + methods + "}\n"
    val exec = ExecRef.compiled(JavaBackend.instance(name, source).asInstanceOf[RowExec], name, source)
    new SpoofRowwise(name, variant, exec)
  }

  /** Emit a Row-chain node; Left(var) = vector, Right(expr) = scalar. */
  private def emitRow(h: Hop, cplan: CPlan, src: Src): Either[String, String] = {
    val main = cplan.inputs(0)
    val rowDim = cplan.rowDim
    if (h eq main) return Left("a")
    src.memo.get(h.id) match {
      case Some(v) => return if (v.startsWith("[]")) Left(v.drop(2)) else Right(v)
      case None =>
    }
    val result: Either[String, String] =
      if (!cplan.covered.contains(h.id)) {
          val k = inputIndex(h, cplan)
          if (h.rows == 1 && h.cols == 1) Right(s"b[$k].get(0, 0)")
          else if (h.rows == rowDim && h.cols == 1) Right(s"b[$k].get(rix, 0)")
          else if (h.rows == 1) {
            val t = src.buf(s"b[$k].cols()")
            src.line(s"b[$k].copyRow(0, $t);")
            Left(t)
          }
          else if (h.rows == rowDim) {
            val t = src.buf(s"b[$k].cols()")
            src.line(s"b[$k].copyRow(rix, $t);")
            Left(t)
          }
          else throw new IllegalStateException(s"non row-aligned side input in Row chain: $h")
      }
      else h match {
        case u: UnaryHop =>
          emitRow(u.in, cplan, src) match {
            case Right(x) => Right(unaryJava(u.op, x))
            case Left(xv) =>
              val t = src.buf(s"$xv.length")
              src.line(s"for (int i_ = 0; i_ < $t.length; i_++) $t[i_] = ${unaryJava(u.op, s"$xv[i_]")};")
              Left(t)
          }
        case bin: BinaryHop =>
          (emitRow(bin.left, cplan, src), emitRow(bin.right, cplan, src)) match {
            case (Right(x), Right(y)) => Right(binaryJava(bin.op, x, y))
            case (Left(xv), Right(y)) =>
              val sv = src.fresh()
              src.line(s"double $sv = $y;")
              val t = src.buf(s"$xv.length")
              src.line(s"for (int i_ = 0; i_ < $t.length; i_++) $t[i_] = ${binaryJava(bin.op, s"$xv[i_]", sv)};")
              Left(t)
            case (Right(x), Left(yv)) =>
              val sv = src.fresh()
              src.line(s"double $sv = $x;")
              val t = src.buf(s"$yv.length")
              src.line(s"for (int i_ = 0; i_ < $t.length; i_++) $t[i_] = ${binaryJava(bin.op, sv, s"$yv[i_]")};")
              Left(t)
            case (Left(xv), Left(yv)) =>
              val t = src.buf(s"$xv.length")
              src.line(s"for (int i_ = 0; i_ < $t.length; i_++) $t[i_] = ${binaryJava(bin.op, s"$xv[i_]", s"$yv[i_]")};")
              Left(t)
          }
        case a: AggHop if a.dir == RowDir =>
          emitRow(a.in, cplan, src) match {
            case Right(x) => Right(x) // rowSums of a per-row scalar is itself
            case Left(xv) =>
              val t = src.fresh()
              a.func match {
                case SumAgg => src.line(s"double $t = VectorPrims.vectSum($xv);")
                case MinAgg =>
                  src.line(s"double $t = Double.POSITIVE_INFINITY;")
                  src.line(s"for (int i_ = 0; i_ < $xv.length; i_++) $t = Math.min($t, $xv[i_]);")
                case MaxAgg =>
                  src.line(s"double $t = Double.NEGATIVE_INFINITY;")
                  src.line(s"for (int i_ = 0; i_ < $xv.length; i_++) $t = Math.max($t, $xv[i_]);")
              }
              Right(t)
          }
        case m: MatMulHop if !TemplateType.isTransposeLeftMatMul(m) =>
          val k = inputIndex(m.right, cplan)
          val scalarOut = m.right.cols == 1
          emitRow(m.left, cplan, src) match {
            case Left(lv) =>
              if (scalarOut) {
                val t = src.fresh()
                src.line(s"double $t = VectorPrims.dotProduct($lv, b[$k].toDense().values(), 0, 0, $lv.length);")
                Right(t)
              } else {
                val tb = src.buf(s"b[$k].cols()")
                src.line(s"VectorPrims.vectMatMultWrite($lv, b[$k].toDense().values(), $tb, $lv.length, b[$k].cols());")
                Left(tb)
              }
            case Right(x) => Right(s"($x * b[$k].get(0, 0))") // 1x1 chain times 1x1 rhs
          }
        case t: TransposeHop =>
          // structural transpose of a row source (read X rows directly)
          emitRow(t.in, cplan, src) match {
            case l @ Left(_) => l
            case r => r
          }
        case _ => throw new IllegalStateException(s"unsupported hop in Row chain: $h")
      }
    src.memo(h.id) = result match {
      case Left(v)  => "[]" + v
      case Right(e) => e
    }
    result
  }

  /** Emit a Row node that must be a vector (coerce scalars to length-1;
    * materialized transpose sides are read by column extraction). */
  private def emitRowVec(h: Hop, cplan: CPlan, src: Src): String = {
    // a materialized transpose side (t(X) read column-wise) needs extraction
    if (!cplan.covered.contains(h.id) && !h.isInstanceOf[LitHop] &&
        h.rows != cplan.rowDim && h.rows != 1) {
      val k = inputIndex(h, cplan)
      val t = src.buf(s"b[$k].rows()")
      src.line(s"for (int i_ = 0; i_ < $t.length; i_++) $t[i_] = b[$k].get(i_, rix);")
      return t
    }
    emitRow(h, cplan, src) match {
      case Left(v) => v
      case Right(x) =>
        val t = src.buf("1")
        src.line(s"$t[0] = $x;")
        t
    }
  }

  // --------------------------------------------------------------- Outer

  private def compileOuter(name: String, cplan: CPlan): SpoofOuterProduct = {
    val variant = cplan.outerVariant.get
    val (chainRoot, wIdx) = cplan.root match {
      case a: AggHop => (a.in, -1)
      case m: MatMulHop if variant == OuterLeftMM =>
        (m.left.asInstanceOf[TransposeHop].in, inputIndex(m.right, cplan))
      case m: MatMulHop if variant == OuterRightMM => (m.left, inputIndex(m.right, cplan))
      case h => (h, -1)
    }
    val opening = CPlan.coveredHops(chainRoot, cplan.covered)
      .collectFirst { case m: MatMulHop if TemplateType.isOuterMatMul(m) => m }
      .getOrElse(throw new IllegalStateException("Outer plan without opening matmult"))
    val rank = opening.left.cols.toInt

    if (!javaBackendActive)
      return new SpoofOuterProduct(name, variant, wIdx,
        ExecRef.direct(new FnOuterExec(outerFn(chainRoot, cplan, opening, rank))))

    val src = new Src
    src.line("int R_ = b[2].cols();") // rank, read from V at runtime
    val root = emitOuter(chainRoot, cplan, opening, rank, src)
    val source = header(name, "OuterExec") +
      "  public double genexec(double x, double[] u, double[] v, MatrixBlock[] b, int rix, int cix) {\n" +
      src.body.toString +
      s"    return $root;\n  }\n}\n"
    new SpoofOuterProduct(name, variant, wIdx,
      ExecRef.compiled(JavaBackend.instance(name, source).asInstanceOf[OuterExec], name, source))
  }

  private def emitOuter(h: Hop, cplan: CPlan, opening: MatMulHop, rank: Int, src: Src): String = {
    val main = cplan.inputs(0)
    if (h eq main) return "x"
    src.memo.get(h.id).foreach(return _)
    val v =
      if (h eq opening) {
        val t = src.fresh()
        src.line(s"double $t = VectorPrims.dotProduct(u, v, rix * R_, cix * R_, R_);")
        t
      }
      else if (!cplan.covered.contains(h.id)) {
        val k = inputIndex(h, cplan)
        val t = src.fresh()
        src.line(s"double $t = b[$k].get(${sideIdx(h)});")
        t
      }
      else h match {
        case u: UnaryHop  => unaryJava(u.op, emitOuter(u.in, cplan, opening, rank, src))
        case bn: BinaryHop =>
          binaryJava(bn.op,
            emitOuter(bn.left, cplan, opening, rank, src),
            emitOuter(bn.right, cplan, opening, rank, src))
        case t: TransposeHop => emitOuter(t.in, cplan, opening, rank, src)
        case _ => throw new IllegalStateException(s"unsupported hop in Outer chain: $h")
      }
    src.memo(h.id) = v
    v
  }

  // ------------------------------------------- closure fallback backend

  private def cellFn(h: Hop, cplan: CPlan): (Double, Array[MatrixBlock], Int, Int) => Double = {
    val main = cplan.inputs(0)
    if (h eq main) { (a, _, _, _) => a }
    else if (!cplan.covered.contains(h.id)) {
      val idx = inputIndex(h, cplan)
      (_, in, i, j) => Spoof.getValue(in(idx), i, j)
    }
    else h match {
      case u: UnaryHop =>
        val f = cellFn(u.in, cplan)
        val op = u.op
        (a, in, i, j) => op(f(a, in, i, j))
      case b: BinaryHop =>
        val fl = cellFn(b.left, cplan)
        val fr = cellFn(b.right, cplan)
        val op = b.op
        (a, in, i, j) => op(fl(a, in, i, j), fr(a, in, i, j))
      case _ =>
        throw new IllegalStateException(s"unsupported hop in Cell chain: $h")
    }
  }

  private def compileRowClosure(name: String, cplan: CPlan, variant: RowVariant): SpoofRowwise = {
    type F = (Array[Double], Array[MatrixBlock], Int) => AnyRef
    val root = cplan.root
    def vec(f: F): (Array[Double], Array[MatrixBlock], Int) => Array[Double] =
      (a, b, i) => f(a, b, i) match {
        case arr: Array[Double]  => arr
        case d: java.lang.Double => Array(d.doubleValue())
      }
    def scalar(f: F, agg: Option[AggFunc]): (Array[Double], Array[MatrixBlock], Int) => Double =
      (a, b, i) => f(a, b, i) match {
        case arr: Array[Double]  => VectorPrims.vectAgg(agg.getOrElse(SumAgg), arr)
        case d: java.lang.Double => d.doubleValue()
      }
    val exec: RowExec = variant match {
      case RowNoAgg   => new FnRowExec(vec(rowFn(root, cplan)), null, null)
      case RowColAgg  => new FnRowExec(vec(rowFn(root.asInstanceOf[AggHop].in, cplan)), null, null)
      case RowFullAgg => new FnRowExec(null, scalar(rowFn(root.asInstanceOf[AggHop].in, cplan), Some(SumAgg)), null)
      case RowRowAgg =>
        val (in, func) = root match {
          case a: AggHop => (a.in, Some(a.func))
          case h         => (h, None)
        }
        new FnRowExec(null, scalar(rowFn(in, cplan), func), null)
      case RowColAggT =>
        val m = root.asInstanceOf[MatMulHop]
        new FnRowExec(vec(rowFn(m.right, cplan)), null, vec(rowFnVecX(m.left, cplan)))
    }
    new SpoofRowwise(name, variant, ExecRef.direct(exec))
  }

  /** x-side of COL_AGG_B1_T in the closure backend: handles a materialized
    * transpose side via column extraction. */
  private def rowFnVecX(h: Hop, cplan: CPlan): (Array[Double], Array[MatrixBlock], Int) => AnyRef = {
    if (!cplan.covered.contains(h.id) && h.rows != cplan.rowDim && h.rows != 1) {
      val idx = inputIndex(h, cplan)
      val len = h.rows.toInt
      (_, in, i) => {
        val out = new Array[Double](len)
        var r = 0
        while (r < len) { out(r) = in(idx).get(r, i); r += 1 }
        out
      }
    } else rowFn(h, cplan)
  }

  private def rowFn(h: Hop, cplan: CPlan): (Array[Double], Array[MatrixBlock], Int) => AnyRef = {
    val main = cplan.inputs(0)
    val rowDim = cplan.rowDim
    if (h eq main) { (row, _, _) => row }
    else if (!cplan.covered.contains(h.id)) {
        val idx = inputIndex(h, cplan)
        if (h.rows == 1 && h.cols == 1) { (_, in, _) => java.lang.Double.valueOf(in(idx).get(0, 0)) }
        else if (h.rows == rowDim && h.cols == 1) { (_, in, i) => java.lang.Double.valueOf(in(idx).get(i, 0)) }
        else if (h.rows == 1) { (_, in, _) => in(idx).denseRow(0) }
        else if (h.rows == rowDim) { (_, in, i) => in(idx).denseRow(i) }
        else throw new IllegalStateException(s"non row-aligned side input in Row chain: $h")
    }
    else h match {
      case u: UnaryHop =>
        val f = rowFn(u.in, cplan)
        val op = u.op
        (row, in, i) => f(row, in, i) match {
          case arr: Array[Double]  => VectorPrims.vectUnaryWrite(op, arr)
          case d: java.lang.Double => java.lang.Double.valueOf(op(d.doubleValue()))
        }
      case b: BinaryHop =>
        val fl = rowFn(b.left, cplan)
        val fr = rowFn(b.right, cplan)
        val op = b.op
        (row, in, i) => (fl(row, in, i), fr(row, in, i)) match {
          case (l: Array[Double], r: Array[Double]) =>
            if (l.length == r.length) VectorPrims.vectBinaryWrite(op, l, r)
            else if (r.length == 1) VectorPrims.vectScalarWrite(op, l, r(0))
            else VectorPrims.scalarVectWrite(op, l(0), r)
          case (l: Array[Double], r: java.lang.Double) => VectorPrims.vectScalarWrite(op, l, r.doubleValue())
          case (l: java.lang.Double, r: Array[Double]) => VectorPrims.scalarVectWrite(op, l.doubleValue(), r)
          case (l: java.lang.Double, r: java.lang.Double) => java.lang.Double.valueOf(op(l.doubleValue(), r.doubleValue()))
          case _ => throw new IllegalStateException("unexpected row value types")
        }
      case a: AggHop if a.dir == RowDir =>
        val f = rowFn(a.in, cplan)
        val func = a.func
        (row, in, i) => f(row, in, i) match {
          case arr: Array[Double]  => java.lang.Double.valueOf(VectorPrims.vectAgg(func, arr))
          case d: java.lang.Double => d
        }
      case m: MatMulHop if !TemplateType.isTransposeLeftMatMul(m) =>
        val fl = rowFn(m.left, cplan)
        val widx = inputIndex(m.right, cplan)
        val kCols = m.right.cols.toInt
        if (kCols == 1)
          (row, in, i) => fl(row, in, i) match {
            case arr: Array[Double] =>
              java.lang.Double.valueOf(VectorPrims.dotProduct(arr, in(widx).toDense.values, 0, 0, arr.length))
            case d: java.lang.Double =>
              java.lang.Double.valueOf(d.doubleValue() * in(widx).get(0, 0))
          }
        else
          (row, in, i) => {
            val arr = fl(row, in, i).asInstanceOf[Array[Double]]
            VectorPrims.vectMatMult(arr, in(widx).toDense.values, 0, arr.length, kCols)
          }
      case t: TransposeHop =>
        rowFn(t.in, cplan)
      case _ =>
        throw new IllegalStateException(s"unsupported hop in Row chain: $h")
    }
  }

  private def outerFn(h: Hop, cplan: CPlan, opening: MatMulHop, rank: Int)
    : (Double, Array[Double], Array[Double], Array[MatrixBlock], Int, Int) => Double = {
    val main = cplan.inputs(0)
    if (h eq main) { (x, _, _, _, _, _) => x }
    else if (h eq opening) {
      (_, u, v, _, i, j) => VectorPrims.dotProduct(u, v, i * rank, j * rank, rank)
    }
    else if (!cplan.covered.contains(h.id)) {
      val idx = inputIndex(h, cplan)
      (_, _, _, in, i, j) => Spoof.getValue(in(idx), i, j)
    }
    else h match {
      case u: UnaryHop =>
        val f = outerFn(u.in, cplan, opening, rank)
        val op = u.op
        (x, uv, vv, in, i, j) => op(f(x, uv, vv, in, i, j))
      case b: BinaryHop =>
        val fl = outerFn(b.left, cplan, opening, rank)
        val fr = outerFn(b.right, cplan, opening, rank)
        val op = b.op
        (x, uv, vv, in, i, j) => op(fl(x, uv, vv, in, i, j), fr(x, uv, vv, in, i, j))
      case t: TransposeHop =>
        outerFn(t.in, cplan, opening, rank)
      case _ =>
        throw new IllegalStateException(s"unsupported hop in Outer chain: $h")
    }
  }
}
