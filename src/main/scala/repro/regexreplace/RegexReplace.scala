package repro.regexreplace

import repro.core.{Pattern, UniFi}

/** The RegexReplace substrate — the §7 baseline modeled on Trifacta
  * Wrangler's manual Replace feature: an ordered recipe of full-match
  * `Replace(regex, replacement)` operations, first match wins, unmatched
  * strings pass through.
  *
  * Internally an op is kept as (pattern, plan) — the executable
  * ground-truth form; its user-facing regex/replacement strings come from
  * `repro.core.RegexExplain` when needed. The simulated user that authors
  * recipes lives in `repro.sim.RegexReplaceSim`.
  */
object RegexReplace {

  /** One authored Replace: full-match pattern → plan over its tokens. */
  final case class Op(pattern: Pattern, plan: UniFi.Plan) {
    def apply(s: String): Option[String] = pattern.split(s).flatMap(plan.eval)
  }

  /** An ordered recipe of Replace operations. */
  final case class Recipe(ops: Vector[Op]) {
    def apply(s: String): String =
      ops.iterator.map(_.apply(s)).collectFirst { case Some(out) => out }.getOrElse(s)
    def prepend(op: Op): Recipe = Recipe(op +: ops)
    def append(op: Op): Recipe = Recipe(ops :+ op)
    def size: Int = ops.size
  }

  val empty: Recipe = Recipe(Vector.empty)
}
