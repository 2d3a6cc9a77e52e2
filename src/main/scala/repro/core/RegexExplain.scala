package repro.core

import UniFi.{Branch, ConstStr, Extract, Program}

/** §5 "Program Explanation": interpret a UniFi program as regexp-replace
  * operations (Fig. 4).
  *
  * Two executable flavors are emitted per branch:
  *   - Java syntax (`$1` references) — runnable via `String.replaceAll` /
  *     Spark `regexp_replace`;
  *   - RE2 syntax (`\1` references) — runnable via DuckDB
  *     `regexp_replace`, used by the oracle tests.
  * Only extracted tokens are wrapped in capturing groups (keeps group
  * counts within RE2's `\9` limit); `renderForUser` additionally merges
  * consecutive extracted tokens into one visual component, as the paper
  * describes.
  */
object RegexExplain {

  /** One regexp replace operation. */
  final case class Replace(pattern: Pattern, regex: String, javaReplacement: String,
                           re2Replacement: String, natural: String) {
    /** Apply with Java semantics (used in tests to cross-check UniFi). */
    def applyJava(s: String): Option[String] =
      if (pattern.matches(s)) Some(s.replaceAll(regex, javaReplacement)) else None
  }

  private def escJavaRepl(s: String): String =
    s.replace("\\", "\\\\").replace("$", "\\$")

  private def escRe2Repl(s: String): String =
    s.replace("\\", "\\\\")

  /** Explain one branch as a Replace operation. */
  def explain(branch: Branch): Replace = {
    val p = branch.pattern
    // Every token index referenced by some Extract gets its own group.
    val extractedIdx: Vector[Int] =
      branch.plan.exprs.collect { case Extract(i, j) => (i to j) }.flatten.distinct.sorted.toVector
    val groupOf: Map[Int, Int] = extractedIdx.zipWithIndex.map { case (t, g) => (t, g + 1) }.toMap

    val regex = p.tokens.zipWithIndex.map { case (t, i) =>
      if (groupOf.contains(i + 1)) s"(${t.regex})" else t.regex
    }.mkString("^", "", "$")

    def repl(ref: Int => String, escape: String => String): String =
      branch.plan.exprs.map {
        case ConstStr(s)   => escape(s)
        case Extract(i, j) => (i to j).map(k => ref(groupOf(k))).mkString
      }.mkString

    Replace(
      pattern = p,
      regex = regex,
      javaReplacement = repl(g => s"$$$g", escJavaRepl),
      re2Replacement = repl(g => s"\\$g", escRe2Repl),
      natural = renderForUser(branch),
    )
  }

  /** Fig. 4-style one-liner with consecutive extracted tokens merged. */
  def renderForUser(branch: Branch): String = {
    val p = branch.pattern
    // merge runs of consecutive token indices extracted by a single op
    val components = branch.plan.exprs.map {
      case ConstStr(s)   => s"'$s'"
      case Extract(i, j) =>
        val txt = (i to j).map(k => p.tokens(k - 1).renderNatural).mkString
        s"($txt)"
    }.mkString
    s"Replace /${p.renderNatural}/ with $components"
  }

  /** Explain every branch of a program. */
  def explainProgram(prog: Program): Vector[Replace] = prog.branches.map(explain)
}
