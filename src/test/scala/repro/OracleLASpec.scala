package repro

import org.apache.spark.sql.DataFrame
import repro.compiler.CostBased
import repro.core._
import repro.runtime._

/** Cross-checks linear algebra results against DuckDB via [[Oracle]]:
  * matrices are exported as (i, j, v) coordinate DataFrames and the LA
  * operation is expressed in SQL (matmult = join + group-by). This
  * catches systematically wrong kernels/codegen, not just crashes. */
class OracleLASpec extends SparkSpec {

  private def toDF(m: MatrixBlock): DataFrame = {
    import spark.implicits._
    val cells = for (i <- 0 until m.rows; j <- 0 until m.cols)
      yield (i.toLong, j.toLong, m.get(i, j))
    cells.toDF("i", "j", "v")
  }

  private def resultDF(m: MatrixBlock): DataFrame = toDF(m)

  private val a = MatrixBlock.rand(12, 7, 1.0, 1, min = -2, max = 2)
  private val b = MatrixBlock.rand(7, 5, 1.0, 2, min = -2, max = 2)
  private val s = MatrixBlock.rand(12, 7, 0.4, 3, min = -2, max = 2)

  private def genEval(build: ExecContext => MX): MatrixBlock = {
    val ctx = new ExecContext(GenMode(CostBased))
    ctx.eval(Seq(build(ctx))).head.toLocal
  }

  test("oracle: matrix multiply == SQL join+group-by") {
    val got = genEval { implicit ctx =>
      ctx.bindLocal("A", a) %*% ctx.bindLocal("B", b)
    }
    Oracle.assertEquivalent(
      resultDF(got),
      """SELECT a.i AS i, b.j AS j, SUM(CAST(a.v AS DOUBLE) * CAST(b.v AS DOUBLE)) AS v
        |FROM a JOIN b ON CAST(a.j AS BIGINT) = CAST(b.i AS BIGINT)
        |GROUP BY a.i, b.j""".stripMargin,
      "a" -> toDF(a), "b" -> toDF(b))
  }

  test("oracle: fused sum(A ⊙ A) == SQL aggregate") {
    val got = genEval { implicit ctx =>
      val x = ctx.bindLocal("A", a)
      (x * x).sum
    }
    import spark.implicits._
    Oracle.assertEquivalent(
      Seq(got.get(0, 0)).toDF("v"),
      "SELECT SUM(CAST(v AS DOUBLE) * CAST(v AS DOUBLE)) AS v FROM a",
      "a" -> toDF(a))
  }

  test("oracle: fused rowSums(A * 2) == SQL group-by") {
    val got = genEval { implicit ctx =>
      (ctx.bindLocal("A", a) * 2.0).rowSums
    }
    import spark.implicits._
    val gotDF = (0 until got.rows).map(i => (i.toLong, got.get(i, 0))).toDF("i", "v")
    Oracle.assertEquivalent(
      gotDF,
      "SELECT CAST(i AS BIGINT) AS i, SUM(CAST(v AS DOUBLE) * 2.0) AS v FROM a GROUP BY i",
      "a" -> toDF(a))
  }

  test("oracle: fused colSums over sparse == SQL group-by") {
    val got = genEval { implicit ctx =>
      ctx.bindLocal("S", s).colSums
    }
    import spark.implicits._
    val gotDF = (0 until got.cols).map(j => (j.toLong, got.get(0, j))).toDF("j", "v")
    Oracle.assertEquivalent(
      gotDF,
      "SELECT CAST(j AS BIGINT) AS j, SUM(CAST(v AS DOUBLE)) AS v FROM s GROUP BY j",
      "s" -> toDF(s))
  }

  test("oracle: transpose == SQL column swap") {
    val got = genEval { implicit ctx => ctx.bindLocal("A", a).t.exp.log }
    Oracle.assertEquivalent(
      resultDF(got),
      "SELECT CAST(j AS BIGINT) AS i, CAST(i AS BIGINT) AS j, LN(EXP(CAST(v AS DOUBLE))) AS v FROM a",
      "a" -> toDF(a))
  }

  test("oracle: fused mmchain t(A)(Av) == SQL double join") {
    val v = MatrixBlock.rand(7, 1, 1.0, 4)
    val got = genEval { implicit ctx =>
      val x = ctx.bindLocal("A", a)
      x.t %*% (x %*% ctx.bindLocal("vv", v))
    }
    import spark.implicits._
    val gotDF = (0 until got.rows).map(i => (i.toLong, got.get(i, 0))).toDF("i", "v")
    Oracle.assertEquivalent(
      gotDF,
      """WITH av AS (
        |  SELECT a.i AS i, SUM(CAST(a.v AS DOUBLE) * CAST(vv.v AS DOUBLE)) AS v
        |  FROM a JOIN vv ON CAST(a.j AS BIGINT) = CAST(vv.i AS BIGINT) GROUP BY a.i)
        |SELECT CAST(a.j AS BIGINT) AS i, SUM(CAST(a.v AS DOUBLE) * av.v) AS v
        |FROM a JOIN av ON CAST(a.i AS BIGINT) = CAST(av.i AS BIGINT) GROUP BY a.j""".stripMargin,
      "a" -> toDF(a), "vv" -> toDF(v))
  }
}
