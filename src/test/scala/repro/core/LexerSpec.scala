package repro.core

import org.scalatest.funsuite.AnyFunSuite
import Lexer._

class LexerSpec extends AnyFunSuite {

  private def kinds(src: String) = Lexer.tokenize(src).map(_.kind)
  private def texts(src: String) = Lexer.tokenize(src).dropRight(1).map(_.text)

  test("empty input yields only EOF") {
    assert(kinds("") == Vector(TEof))
  }

  test("whitespace-only input yields only EOF") {
    assert(kinds("  \t\n  ") == Vector(TEof))
  }

  test("identifiers") {
    assert(texts("proc p1 osql_exe") == Vector("proc", "p1", "osql_exe"))
    assert(kinds("proc").head == TIdent)
  }

  test("identifiers may contain underscores and digits") {
    assert(texts("dst_ip amt2 _x") == Vector("dst_ip", "amt2", "_x"))
  }

  test("numbers: integers and decimals") {
    val ts = Lexer.tokenize("42 3.14 0")
    assert(ts.dropRight(1).map(_.text) == Vector("42", "3.14", "0"))
    assert(ts.dropRight(1).forall(_.kind == TNum))
  }

  test("number followed by dot-punctuation keeps dot separate") {
    assert(texts("1..2") == Vector("1", ".", ".", "2"))
    assert(texts("1.5.x") == Vector("1.5", ".", "x"))
  }

  test("string literals") {
    val ts = Lexer.tokenize("\"%cmd.exe\"")
    assert(ts.head.kind == TStr)
    assert(ts.head.text == "%cmd.exe")
  }

  test("string literal with escaped quote") {
    val ts = Lexer.tokenize("\"a\\\"b\"")
    assert(ts.head.text == "a\"b")
  }

  test("unterminated string throws") {
    assertThrows[LexError](Lexer.tokenize("\"abc"))
  }

  test("line comments are skipped") {
    assert(texts("proc // comment here\np") == Vector("proc", "p"))
  }

  test("comment at end of input") {
    assert(kinds("// only a comment") == Vector(TEof))
  }

  test("two-char punctuation") {
    assert(texts("&& || != <= >= ->") == Vector("&&", "||", "!=", "<=", ">=", "->"))
  }

  test("single-char punctuation") {
    assert(texts("( ) [ ] , . = < > + - * / !") ==
      Vector("(", ")", "[", "]", ",", ".", "=", "<", ">", "+", "-", "*", "/", "!"))
  }

  test("adjacent punctuation tokenizes greedily") {
    assert(texts("a<=b") == Vector("a", "<=", "b"))
    assert(texts("a<b") == Vector("a", "<", "b"))
  }

  test("unexpected character throws with offset") {
    val e = intercept[LexError](Lexer.tokenize("proc @"))
    assert(e.pos == 5)
  }

  test("positions are source offsets") {
    val ts = Lexer.tokenize("ab cd")
    assert(ts(0).pos == 0 && ts(1).pos == 3)
  }

  test("query 1 shape tokenizes") {
    val src = """(at "08/01/2023")
                |agentid = 4
                |proc p1["%cmd.exe"] start proc p2["%osql.exe"] as evt1
                |return p1, p2""".stripMargin
    val ts = Lexer.tokenize(src)
    assert(ts.last.kind == TEof)
    assert(ts.count(_.kind == TStr) == 3)
    assert(ts.exists(_.isIdent("return")))
  }

  test("isIdent is case-insensitive") {
    assert(Lexer.tokenize("RETURN").head.isIdent("return"))
  }

  test("is() matches punctuation exactly") {
    val t = Lexer.tokenize("->").head
    assert(t.is("->") && !t.is("-"))
  }

  test("history-reference brackets tokenize") {
    assert(texts("amt[1]") == Vector("amt", "[", "1", "]"))
  }
}
