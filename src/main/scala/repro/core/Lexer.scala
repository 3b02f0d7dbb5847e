package repro.core

/** Tokenizer for the AIQL language.
  *
  * The paper builds its grammar with ANTLR 4; the ANTLR tool is unavailable
  * offline, so lexing is hand-written. Tokens carry their source offset for
  * error reporting. `//` comments run to end of line. Keywords are not
  * distinguished here — the parser matches identifier text case-insensitively.
  */
object Lexer {

  sealed trait TokKind
  case object TIdent  extends TokKind
  case object TNum    extends TokKind
  case object TStr    extends TokKind
  case object TPunct  extends TokKind
  case object TEof    extends TokKind

  final case class Token(kind: TokKind, text: String, pos: Int) {
    def is(t: String): Boolean = kind == TPunct && text == t
    /** Case-insensitive identifier/keyword match. */
    def isIdent(s: String): Boolean = kind == TIdent && text.equalsIgnoreCase(s)
  }

  final case class LexError(msg: String, pos: Int)
      extends RuntimeException(s"$msg at offset $pos")

  private val punct2 = Set("&&", "||", "!=", "<=", ">=", "->", "<-")
  private val punct1 = Set("(", ")", "[", "]", ",", ".", "=", "<", ">", "+",
                           "-", "*", "/", "!")

  def tokenize(src: String): Vector[Token] = {
    val out = Vector.newBuilder[Token]
    var i = 0
    val n = src.length
    while (i < n) {
      val c = src(i)
      if (c.isWhitespace) i += 1
      else if (c == '/' && i + 1 < n && src(i + 1) == '/') {
        while (i < n && src(i) != '\n') i += 1
      } else if (c == '"') {
        val start = i; i += 1
        val sb = new StringBuilder
        while (i < n && src(i) != '"') {
          if (src(i) == '\\' && i + 1 < n) { sb.append(src(i + 1)); i += 2 }
          else { sb.append(src(i)); i += 1 }
        }
        if (i >= n) throw LexError("unterminated string literal", start)
        i += 1
        out += Token(TStr, sb.toString, start)
      } else if (c.isDigit) {
        val start = i
        while (i < n && src(i).isDigit) i += 1
        // at most one decimal point, and only when digits follow it
        if (i + 1 < n && src(i) == '.' && src(i + 1).isDigit) {
          i += 1
          while (i < n && src(i).isDigit) i += 1
        }
        out += Token(TNum, src.substring(start, i), start)
      } else if (c.isLetter || c == '_') {
        val start = i
        while (i < n && (src(i).isLetterOrDigit || src(i) == '_')) i += 1
        out += Token(TIdent, src.substring(start, i), start)
      } else if (i + 1 < n && punct2.contains(src.substring(i, i + 2))) {
        out += Token(TPunct, src.substring(i, i + 2), i); i += 2
      } else if (punct1.contains(c.toString)) {
        out += Token(TPunct, c.toString, i); i += 1
      } else {
        throw LexError(s"unexpected character '$c'", i)
      }
    }
    out += Token(TEof, "<eof>", n)
    out.result()
  }
}
