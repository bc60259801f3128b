package repro.query

/** Shared tokenizer for the Gremlin and Cypher front-ends. */
object Lexer {
  sealed trait Tok
  final case class Ident(s: String) extends Tok
  final case class Num(v: Double, isInt: Boolean) extends Tok
  final case class Str(s: String) extends Tok
  final case class Punct(s: String) extends Tok

  private val puncts = Seq(
    "<-", "->", "<>", "<=", ">=", "=~",
    "(", ")", "[", "]", "{", "}", ",", ".", ":", ";",
    "=", "<", ">", "-", "+", "*", "/", "$", "|")

  def tokenize(input: String): Vector[Tok] = {
    val out = Vector.newBuilder[Tok]
    var i = 0
    val n = input.length
    while (i < n) {
      val c = input(i)
      if (c.isWhitespace) i += 1
      else if (c == '/' && i + 1 < n && input(i + 1) == '*') {
        val end = input.indexOf("*/", i + 2)
        i = if (end < 0) n else end + 2
      } else if (c == '/' && i + 1 < n && input(i + 1) == '/') {
        val end = input.indexOf('\n', i)
        i = if (end < 0) n else end + 1
      } else if (c == '\'' || c == '"') {
        val sb = new StringBuilder
        i += 1
        while (i < n && input(i) != c) {
          if (input(i) == '\\' && i + 1 < n) { sb.append(input(i + 1)); i += 2 }
          else { sb.append(input(i)); i += 1 }
        }
        i += 1
        out += Str(sb.toString)
      } else if (c.isDigit) {
        val start = i
        while (i < n && (input(i).isDigit || input(i) == '.')) i += 1
        val s = input.substring(start, i)
        out += Num(s.toDouble, !s.contains('.'))
      } else if (c.isLetter || c == '_') {
        val start = i
        while (i < n && (input(i).isLetterOrDigit || input(i) == '_')) i += 1
        out += Ident(input.substring(start, i))
      } else {
        puncts.find(p => input.startsWith(p, i)) match {
          case Some(p) => out += Punct(p); i += p.length
          case None => throw new IllegalArgumentException(
            s"unexpected character '$c' at $i in: $input")
        }
      }
    }
    out.result()
  }

  /** Simple token stream with 1-token lookahead helpers. */
  final class Stream(toks: Vector[Tok]) {
    private var pos = 0
    def eof: Boolean = pos >= toks.length
    def peek: Tok = if (eof) Punct("<eof>") else toks(pos)
    def peek2: Tok = if (pos + 1 >= toks.length) Punct("<eof>") else toks(pos + 1)
    def next(): Tok = { val t = peek; pos += 1; t }
    def expectPunct(s: String): Unit = next() match {
      case Punct(`s`) =>
      case other => fail(s"expected '$s', got $other")
    }
    def expectKeyword(kw: String): Unit = next() match {
      case Ident(s) if s.equalsIgnoreCase(kw) =>
      case other => fail(s"expected $kw, got $other")
    }
    def isKeyword(kw: String): Boolean = peek match {
      case Ident(s) => s.equalsIgnoreCase(kw)
      case _ => false
    }
    def tryPunct(s: String): Boolean = peek match {
      case Punct(`s`) => pos += 1; true
      case _ => false
    }
    def ident(): String = next() match {
      case Ident(s) => s
      case other => fail(s"expected identifier, got $other")
    }
    def fail(msg: String): Nothing =
      throw new IllegalArgumentException(s"parse error at token $pos: $msg")
  }
}
