package repro.tydi.til

import repro.SparkSpec

class LexerSpec extends SparkSpec {

  private def toks(src: String): Vector[Token] = Lexer.tokenize(src).dropRight(1)

  test("identifiers, keywords and underscores") {
    assert(toks("streamlet my_comp1") == Vector(
      TIdent("streamlet", Pos(1, 1)), TIdent("my_comp1", Pos(1, 11))))
  }

  test("integers and decimals") {
    assert(toks("128 128.0 1.5").collect {
      case TInt(v, _)     => v.toString
      case TDecimal(s, _) => s
    } == Vector("128", "128.0", "1.5"))
  }

  test("an integer followed by '.' without digits is not a decimal") {
    assert(toks("a.b").map {
      case TIdent(n, _) => n
      case TPunct(p, _) => p
      case t            => t.toString
    } == Vector("a", ".", "b"))
  }

  test("strings carry their contents") {
    assert(toks("\"./path/to/dir\"") == Vector(TString("./path/to/dir", Pos(1, 1))))
  }

  test("documentation blocks are tokens, not trivia (#..# syntax)") {
    assert(toks("#hello doc#") == Vector(TDoc("hello doc", Pos(1, 1))))
  }

  test("multi-line documentation is preserved") {
    val Vector(TDoc(text, _)) = toks("#this is port\ndocumentation#")
    assert(text == "this is port\ndocumentation")
  }

  test("comments are skipped entirely — distinct from documentation (§7.2)") {
    assert(toks("a // comment text\nb").collect { case TIdent(n, _) => n } ==
      Vector("a", "b"))
  }

  test("two-character punctuation: -- and ::") {
    assert(toks("a -- b::c").map {
      case TIdent(n, _) => n
      case TPunct(p, _) => p
      case t            => t.toString
    } == Vector("a", "--", "b", "::", "c"))
  }

  test("domain tick and angle brackets") {
    assert(toks("<'dom>").map {
      case TIdent(n, _) => n
      case TPunct(p, _) => p
      case t            => t.toString
    } == Vector("<", "'", "dom", ">"))
  }

  test("positions track lines and columns") {
    val ts = toks("ab\n  cd")
    assert(ts(0).pos == Pos(1, 1))
    assert(ts(1).pos == Pos(2, 3))
  }

  test("unterminated string raises a LexError") {
    intercept[LexError](Lexer.tokenize("\"oops"))
  }

  test("unterminated documentation raises a LexError") {
    intercept[LexError](Lexer.tokenize("#oops"))
  }

  test("unexpected characters raise a LexError with position") {
    val e = intercept[LexError](Lexer.tokenize("a @ b"))
    assert(e.pos == Pos(1, 3))
  }
}
