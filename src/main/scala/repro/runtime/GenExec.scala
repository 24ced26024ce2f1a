package repro.runtime

import java.io.ByteArrayOutputStream
import java.net.URI
import javax.tools._
import scala.collection.concurrent.TrieMap
import scala.jdk.CollectionConverters._

/** Abstract genexec signatures implemented by generated operators — the
  * analogue of SystemML's SpoofCellwise/SpoofRowwise/SpoofOuterProduct
  * genexec methods (paper §2.2). Primitive signatures avoid any boxing in
  * the per-value hot path; generated Java subclasses get fully JIT-inlined.
  */
abstract class CellExec extends Serializable {
  def genexec(a: Double, b: Array[MatrixBlock], rix: Int, cix: Int): Double
}
abstract class RowExec extends Serializable {
  /** Vector-rooted variants (NO_AGG, COL_AGG, z-side of COL_AGG_B1_T). */
  def genexecVec(a: Array[Double], b: Array[MatrixBlock], rix: Int): Array[Double] = null
  /** Scalar-rooted variants (ROW_AGG, FULL_AGG). */
  def genexecScalar(a: Array[Double], b: Array[MatrixBlock], rix: Int): Double = 0.0
  /** The x-side row of COL_AGG_B1_T (t(X) %*% Z). */
  def genexecVec2(a: Array[Double], b: Array[MatrixBlock], rix: Int): Array[Double] = null
}
abstract class OuterExec extends Serializable {
  def genexec(x: Double, u: Array[Double], v: Array[Double],
              b: Array[MatrixBlock], rix: Int, cix: Int): Double
}

/** Closure-backed fallbacks (used when no system Java compiler exists). */
final class FnCellExec(f: (Double, Array[MatrixBlock], Int, Int) => Double) extends CellExec {
  def genexec(a: Double, b: Array[MatrixBlock], rix: Int, cix: Int): Double = f(a, b, rix, cix)
}
final class FnRowExec(
    vec: (Array[Double], Array[MatrixBlock], Int) => Array[Double],
    scalar: (Array[Double], Array[MatrixBlock], Int) => Double,
    vec2: (Array[Double], Array[MatrixBlock], Int) => Array[Double],
) extends RowExec {
  override def genexecVec(a: Array[Double], b: Array[MatrixBlock], rix: Int): Array[Double] =
    if (vec == null) null else vec(a, b, rix)
  override def genexecScalar(a: Array[Double], b: Array[MatrixBlock], rix: Int): Double =
    if (scalar == null) 0.0 else scalar(a, b, rix)
  override def genexecVec2(a: Array[Double], b: Array[MatrixBlock], rix: Int): Array[Double] =
    if (vec2 == null) null else vec2(a, b, rix)
}
final class FnOuterExec(f: (Double, Array[Double], Array[Double], Array[MatrixBlock], Int, Int) => Double) extends OuterExec {
  def genexec(x: Double, u: Array[Double], v: Array[Double],
              b: Array[MatrixBlock], rix: Int, cix: Int): Double = f(x, u, v, b, rix, cix)
}

/** A serializable reference to a genexec. Java-generated execs ship their
  * source and re-resolve through the per-JVM compile cache on
  * deserialization (the distributed runtime rebuilds generated operators
  * on any executor); closure-backed execs serialize directly. */
final class ExecRef[T <: AnyRef] private (
    @transient private var inst: T,
    val className: String,
    val source: String,
    private val directInst: T, // serialized as-is for closure-backed execs
) extends Serializable {
  def get: T = {
    if (directInst != null) return directInst
    // generated classes carry reusable row buffers -> one instance per thread
    JavaBackend.threadInstance(className, source).asInstanceOf[T]
  }
}
object ExecRef {
  /** A ref to a Java-compiled exec, re-resolvable from source. */
  def compiled[T <: AnyRef](inst: T, className: String, source: String): ExecRef[T] =
    new ExecRef[T](inst, className, source, null.asInstanceOf[T])
  /** A ref for a closure-backed exec. */
  def direct[T <: AnyRef](inst: T): ExecRef[T] =
    new ExecRef[T](inst, null, null, inst)
}

/** In-memory Java compilation of generated operators — the paper's javac
  * path (Fig. 11; janino is not available offline, javac ships with the
  * JDK). Compiled classes and instances are cached per JVM. */
object JavaBackend {

  lazy val compiler: JavaCompiler = ToolProvider.getSystemJavaCompiler
  lazy val available: Boolean =
    compiler != null && {
      // the forked JVM must carry the application classpath for javac to
      // resolve repro.runtime.* supertypes
      try { compileClass("ReproProbe", probeSource); true }
      catch { case _: Throwable => false }
    }

  private val classCache = TrieMap[String, Class[_]]()
  private val instCache = TrieMap[String, AnyRef]()

  private val probeSource =
    "package repro.codegen;\n" +
    "public final class ReproProbe extends repro.runtime.CellExec {\n" +
    "  public double genexec(double a, repro.runtime.MatrixBlock[] b, int rix, int cix) { return a; }\n" +
    "}\n"

  def instance(className: String, source: String): AnyRef =
    instCache.getOrElseUpdate(className,
      compileClass(className, source).getDeclaredConstructor().newInstance().asInstanceOf[AnyRef])

  private val threadInsts = new ThreadLocal[java.util.HashMap[String, AnyRef]] {
    override def initialValue() = new java.util.HashMap[String, AnyRef]()
  }
  /** Per-thread instance (generated operators hold per-row ring buffers). */
  def threadInstance(className: String, source: String): AnyRef = {
    val m = threadInsts.get()
    var inst = m.get(className)
    if (inst == null) {
      inst = compileClass(className, source).getDeclaredConstructor().newInstance().asInstanceOf[AnyRef]
      m.put(className, inst)
    }
    inst
  }

  def compileClass(className: String, source: String): Class[_] =
    classCache.getOrElseUpdate(className, doCompile(className, source))

  private final class MemSource(name: String, code: String)
    extends SimpleJavaFileObject(URI.create(s"string:///repro/codegen/$name.java"), JavaFileObject.Kind.SOURCE) {
    override def getCharContent(ignore: Boolean): CharSequence = code
  }
  private final class MemClass(name: String)
    extends SimpleJavaFileObject(URI.create(s"mem:///$name.class"), JavaFileObject.Kind.CLASS) {
    val bytes = new ByteArrayOutputStream()
    override def openOutputStream(): ByteArrayOutputStream = bytes
  }

  // one standard file manager per JVM — a fresh one per compile would
  // reopen (and leak) every classpath jar
  private lazy val stdFm: StandardJavaFileManager =
    compiler.getStandardFileManager(null, null, null)

  private def doCompile(className: String, source: String): Class[_] = synchronized {
    val diag = new DiagnosticCollector[JavaFileObject]()
    val outputs = TrieMap[String, MemClass]()
    val fm = new ForwardingJavaFileManager[JavaFileManager](stdFm) {
      override def getJavaFileForOutput(location: JavaFileManager.Location, name: String,
                                        kind: JavaFileObject.Kind, sibling: FileObject): JavaFileObject = {
        val mc = new MemClass(name)
        outputs(name) = mc
        mc
      }
    }
    val options = List("-classpath", sys.props.getOrElse("java.class.path", "")).asJava
    val task = compiler.getTask(null, fm, diag, options, null,
      List[JavaFileObject](new MemSource(className, source)).asJava)
    if (!task.call())
      throw new IllegalStateException(
        "javac failed:\n" + diag.getDiagnostics.asScala.mkString("\n") + "\n--- source ---\n" + source)
    val parent = getClass.getClassLoader
    val loader = new ClassLoader(parent) {
      override def findClass(name: String): Class[_] =
        outputs.get(name) match {
          case Some(mc) =>
            val bs = mc.bytes.toByteArray
            defineClass(name, bs, 0, bs.length)
          case None => throw new ClassNotFoundException(name)
        }
    }
    loader.loadClass(s"repro.codegen.$className")
  }
}
