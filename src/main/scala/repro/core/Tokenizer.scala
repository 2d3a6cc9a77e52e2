package repro.core

/** §4.1 tokenization.
  *
  * Rules (verbatim from the paper):
  *   - each non-alphanumeric character is an individual literal token;
  *   - alphanumeric runs use the most precise base type (`<D>`, `<L>`,
  *     `<U>` — never `<A>`/`<AN>` at this stage);
  *   - quantifiers are natural numbers (run lengths).
  *
  * Example: `"Bob123@gmail.com"` →
  * `[<U>1, <L>2, <D>3, '@', <L>5, '.', <L>3]`.
  */
object Tokenizer {

  private def classOf(c: Char): Option[TokType] =
    if (c >= '0' && c <= '9') Some(TokType.D)
    else if (c >= 'a' && c <= 'z') Some(TokType.L)
    else if (c >= 'A' && c <= 'Z') Some(TokType.U)
    else None

  /** Tokenize a string into its leaf pattern. The empty string maps to the
    * empty pattern (a cluster of its own).
    */
  def tokenize(s: String): Pattern = {
    val out = Vector.newBuilder[Token]
    var i = 0
    val n = s.length
    while (i < n) {
      val c = s.charAt(i)
      classOf(c) match {
        case Some(t) =>
          var j = i + 1
          while (j < n && classOf(s.charAt(j)).contains(t)) j += 1
          out += Token(t, Quant.Num(j - i))
          i = j
        case None =>
          out += Token.lit(c.toString)
          i += 1
      }
    }
    Pattern(out.result())
  }

  /** Tokenize and also return the per-token substrings (used by constant
    * discovery and by grounded plan checking; avoids a regex round-trip).
    */
  def tokenizeWithValues(s: String): (Pattern, Vector[String]) = {
    val p = tokenize(s)
    var idx = 0
    val vals = p.tokens.map { t =>
      val len = t.tpe match {
        case TokType.Lit(v) => v.length
        case _ => t.quant match {
          case Quant.Num(n) => n
          case Quant.Plus   => sys.error("leaf tokens never carry '+'")
        }
      }
      val v = s.substring(idx, idx + len)
      idx += len
      v
    }
    (p, vals)
  }
}
