package repro.tydi.til

/** Tokens of the Tydi Intermediate Language (TIL, paper §7.2). */
sealed trait Token { def pos: Pos }
final case class Pos(line: Int, col: Int) {
  override def toString: String = s"$line:$col"
}

final case class TIdent(name: String, pos: Pos)   extends Token
final case class TInt(value: Long, pos: Pos)      extends Token
final case class TDecimal(text: String, pos: Pos) extends Token
final case class TString(value: String, pos: Pos) extends Token
/** Documentation (`#text#`): an actual property of its subject, distinct
  * from comments (paper §7.2, Listing 1).
  */
final case class TDoc(text: String, pos: Pos)     extends Token
final case class TPunct(text: String, pos: Pos)   extends Token
final case class TEof(pos: Pos)                   extends Token

final case class LexError(message: String, pos: Pos)
    extends RuntimeException(s"$pos: $message")

/** Hand-written lexer for TIL. `//` comments are skipped (they are not
  * documentation); `#..#` blocks become [[TDoc]] tokens.
  */
object Lexer {

  private val puncts2 = Set("--", "::")
  private val puncts1 = Set("{", "}", "(", ")", "[", "]", "<", ">", ":", ";", ",", "=", ".", "'")

  def tokenize(src: String): Vector[Token] = {
    val out  = Vector.newBuilder[Token]
    var i    = 0
    var line = 1
    var col  = 1

    def pos = Pos(line, col)
    def advance(c: Char): Unit =
      if (c == '\n') { line += 1; col = 1 } else col += 1

    while (i < src.length) {
      val c = src(i)
      if (c.isWhitespace) { advance(c); i += 1 }
      else if (c == '/' && i + 1 < src.length && src(i + 1) == '/') {
        while (i < src.length && src(i) != '\n') { advance(src(i)); i += 1 }
      } else if (c == '#') {
        val p     = pos
        advance(c); i += 1
        val start = i
        while (i < src.length && src(i) != '#') { advance(src(i)); i += 1 }
        if (i >= src.length) throw LexError("unterminated documentation block", p)
        out += TDoc(src.substring(start, i).trim, p)
        advance(src(i)); i += 1
      } else if (c == '"') {
        val p     = pos
        advance(c); i += 1
        val start = i
        while (i < src.length && src(i) != '"') {
          if (src(i) == '\n') throw LexError("unterminated string literal", p)
          advance(src(i)); i += 1
        }
        if (i >= src.length) throw LexError("unterminated string literal", p)
        out += TString(src.substring(start, i), p)
        advance(src(i)); i += 1
      } else if (c.isDigit) {
        val p     = pos
        val start = i
        while (i < src.length && src(i).isDigit) { advance(src(i)); i += 1 }
        if (i < src.length && src(i) == '.' && i + 1 < src.length && src(i + 1).isDigit) {
          advance(src(i)); i += 1
          while (i < src.length && src(i).isDigit) { advance(src(i)); i += 1 }
          out += TDecimal(src.substring(start, i), p)
        } else out += TInt(src.substring(start, i).toLong, p)
      } else if (c.isLetter || c == '_') {
        val p     = pos
        val start = i
        while (i < src.length && (src(i).isLetterOrDigit || src(i) == '_')) {
          advance(src(i)); i += 1
        }
        out += TIdent(src.substring(start, i), p)
      } else {
        val p = pos
        val two = if (i + 1 < src.length) src.substring(i, i + 2) else ""
        if (puncts2.contains(two)) {
          advance(src(i)); advance(src(i + 1)); i += 2
          out += TPunct(two, p)
        } else if (puncts1.contains(c.toString)) {
          advance(c); i += 1
          out += TPunct(c.toString, p)
        } else throw LexError(s"unexpected character '$c'", p)
      }
    }
    out += TEof(pos)
    out.result()
  }
}
