package repro.saql

import org.scalatest.funsuite.AnyFunSuite

class LexerSpec extends AnyFunSuite {
  import Token._

  private def lex(s: String): Vector[Token] = Lexer.tokenize(s)
  private def texts(s: String): Vector[String] = lex(s).dropRight(1).map(_.text)

  test("empty input yields only EOF") {
    assert(lex("").map(_.getClass.getSimpleName) == Vector("Eof"))
  }

  test("identifiers with underscores and digits") {
    assert(texts("exe_name p1 set_proc _x a2b") ==
      Vector("exe_name", "p1", "set_proc", "_x", "a2b"))
  }

  test("integers and floats") {
    val ts = lex("10 3.5 10000")
    assert(ts.collect { case n: Num => n.value } == Vector(10.0, 3.5, 10000.0))
  }

  test("quoted strings keep contents, drop quotes") {
    assert(lex("\"%cmd.exe\"").head == Str("%cmd.exe", 0))
  }

  test("string with special characters") {
    assert(lex("\"DBSCAN(100000, 5)\"").collect { case s: Str => s.text } ==
      Vector("DBSCAN(100000, 5)"))
  }

  test("unterminated string raises positioned error") {
    val e = intercept[SaqlParseException](lex("\"abc"))
    assert(e.getMessage.contains("unterminated string"))
  }

  test("multi-char symbols are greedy") {
    assert(texts("-> := == != >= <= && ||") ==
      Vector("->", ":=", "==", "!=", ">=", "<=", "&&", "||"))
  }

  test("single pipe vs double pipe") {
    assert(texts("|a||b|") == Vector("|", "a", "||", "b", "|"))
  }

  test("single-char symbols") {
    assert(texts("[ ] { } ( ) , . = < > + - * / #") ==
      Vector("[", "]", "{", "}", "(", ")", ",", ".", "=", "<", ">", "+", "-",
             "*", "/", "#"))
  }

  test("line comments are skipped to end of line") {
    assert(texts("a // comment with proc file ip\nb") == Vector("a", "b"))
  }

  test("comment at end of input") {
    assert(texts("a // trailing") == Vector("a"))
  }

  test("division is not a comment") {
    assert(texts("a / b") == Vector("a", "/", "b"))
  }

  test("unknown character raises positioned error with line/col") {
    val e = intercept[SaqlParseException](lex("a\nb @"))
    assert(e.getMessage.contains("line 2"))
    assert(e.getMessage.contains("unexpected character '@'"))
  }

  test("positions point at token starts") {
    val ts = lex("ab cd")
    assert(ts(0).pos == 0 && ts(1).pos == 3)
  }

  test("a full pattern line tokenizes") {
    assert(texts("""proc p1["%cmd.exe"] start proc p2 as evt1 #time(10 min)""") ==
      Vector("proc", "p1", "[", "%cmd.exe", "]", "start", "proc", "p2", "as",
             "evt1", "#", "time", "(", "10", "min", ")"))
  }

  test("window with arrow chain") {
    assert(texts("with evt1 -> evt2 -> evt3") ==
      Vector("with", "evt1", "->", "evt2", "->", "evt3"))
  }
}
