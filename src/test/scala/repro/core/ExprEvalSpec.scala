package repro.core

import org.apache.spark.sql.functions.col

import repro.SparkSpec
import Ast._

class ExprEvalSpec extends SparkSpec {

  import spark.implicits._

  private lazy val df = Seq(
    ("cmd.exe", 10L, 4.0), ("osql.exe", 20L, 6.0), ("sh", 30L, 8.0),
  ).toDF("exe", "n", "x").cache()

  private def resolve(e: Expr): org.apache.spark.sql.Column = e match {
    case VarRef(v)     => col(v)
    case AttrRef(v, _) => col(v)
    case other         => fail(s"unexpected leaf $other")
  }

  private def rows(e: Expr): Set[String] =
    df.filter(ExprEval.toColumn(e, resolve)).select("exe").collect().map(_.getString(0)).toSet

  test("equality on plain strings") {
    assert(rows(Bin("=", VarRef("exe"), StrLit("sh"))) == Set("sh"))
  }

  test("percent patterns become LIKE") {
    assert(rows(Bin("=", VarRef("exe"), StrLit("%.exe"))) == Set("cmd.exe", "osql.exe"))
  }

  test("negated LIKE") {
    assert(rows(Bin("!=", VarRef("exe"), StrLit("%.exe"))) == Set("sh"))
  }

  test("numeric comparisons") {
    assert(rows(Bin(">", VarRef("n"), NumLit("15"))) == Set("osql.exe", "sh"))
    assert(rows(Bin("<=", VarRef("n"), NumLit("20"))) == Set("cmd.exe", "osql.exe"))
    assert(rows(Bin("!=", VarRef("n"), NumLit("20"))) == Set("cmd.exe", "sh"))
  }

  test("arithmetic combines columns and literals") {
    // n + x*2 > 30 : cmd 18, osql 32, sh 46
    val e = Bin(">", Bin("+", VarRef("n"), Bin("*", VarRef("x"), NumLit("2"))), NumLit("30"))
    assert(rows(e) == Set("osql.exe", "sh"))
  }

  test("division produces fractional comparisons") {
    val e = Bin("<", Bin("/", VarRef("n"), NumLit("4")), NumLit("5.1"))
    assert(rows(e) == Set("cmd.exe", "osql.exe"))
  }

  test("boolean connectives and negation") {
    val a = Bin("=", VarRef("exe"), StrLit("%.exe"))
    val b = Bin(">", VarRef("n"), NumLit("15"))
    assert(rows(Bin("&&", a, b)) == Set("osql.exe"))
    assert(rows(Bin("||", Not(a), b)) == Set("osql.exe", "sh"))
  }

  test("unknown operator throws") {
    assertThrows[ExprEval.EvalError](ExprEval.toColumn(Bin("%%", VarRef("n"), NumLit("1")), resolve))
  }

  test("aggregate helpers") {
    val agg = df.agg(
      ExprEval.aggColumn("avg", col("x")).as("a"),
      ExprEval.aggColumn("sum", col("n")).as("s"),
      ExprEval.aggColumn("min", col("n")).as("mn"),
      ExprEval.aggColumn("max", col("x")).as("mx"),
      ExprEval.aggColumn("count", col("n")).as("c")).collect()(0)
    assert(agg.getDouble(0) == 6.0)
    assert(agg.getLong(1) == 60L)
    assert(agg.getLong(2) == 10L)
    assert(agg.getDouble(3) == 8.0)
    assert(agg.getLong(4) == 3L)
  }

  test("unknown aggregate throws") {
    assertThrows[ExprEval.EvalError](ExprEval.aggColumn("median", col("x")))
  }

  test("hasAgg detects nesting") {
    assert(ExprEval.hasAgg(Agg("avg", VarRef("x"))))
    assert(ExprEval.hasAgg(Bin("+", NumLit("1"), Agg("sum", VarRef("x")))))
    assert(!ExprEval.hasAgg(Bin("+", VarRef("x"), NumLit("1"))))
  }

  test("integral literals stay integral") {
    assert(NumLit("42").isIntegral)
    assert(!NumLit("42.5").isIntegral)
    assert(!NumLit("4e2").isIntegral)
  }
}
