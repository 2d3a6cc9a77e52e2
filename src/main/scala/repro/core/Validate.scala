package repro.core

/** §6.1 source-candidate validation by token-frequency count (Eq. 1–2).
  *
  * `Q(<t̃>, p)` sums the quantifiers of p's tokens of exactly class `<t̃>`
  * (`+` counts as 1). A source pattern is a candidate iff its frequency is
  * ≥ the target's for every base class.
  *
  * Deviation (documented in DESIGN.md): constant discovery can fold base
  * tokens into literals (e.g. `'734'`), so on the *source* side literal
  * contents contribute character counts to `<D>`/`<L>`/`<U>` (the source
  * really does hold that material). Target-side literals contribute
  * nothing: a constant target token is produced by `ConstStr`, requiring
  * no source material — counting it (e.g. the `'1'` in a `'+1 ('` phone
  * prefix) would wrongly disqualify every source.
  */
object Validate {

  /** Token frequency Q of base class `cls` in `p` (Eq. 1), optionally
    * crediting literal contents (source side).
    */
  def freq(cls: TokType, p: Pattern, countLiterals: Boolean): Int =
    p.tokens.map {
      case Token(TokType.Lit(v), _) =>
        cls match {
          case TokType.D | TokType.L | TokType.U if countLiterals =>
            v.count(c => TokType.matches(cls, c))
          case _ => 0
        }
      case Token(tpe, q) if tpe == cls => q.freqValue
      case _                           => 0
    }.sum

  /** Paper's Q (base tokens only). */
  def freq(cls: TokType, p: Pattern): Int = freq(cls, p, countLiterals = false)

  /** V(source, target) — Eq. 2, exactly as in the paper (base tokens only).
    * Rejecting a generalized pattern whose class material was washed into
    * `<A>`/`<AN>` is what drives Algorithm 2 to descend to more specific
    * children (the paper's reason 3 in §6.1).
    */
  def validate(source: Pattern, target: Pattern): Boolean =
    TokType.baseClasses.forall(cls => freq(cls, source) >= freq(cls, target))

  /** Leaf-level variant: constants discovered at the leaves (e.g. `'CPT'`)
    * still hold extractable class material, so literal contents are
    * credited on the source side. Using this at internal nodes would let
    * over-general patterns pass on literal material alone and stop the
    * descent the paper relies on — hence the split.
    */
  def validateLeaf(source: Pattern, target: Pattern): Boolean =
    TokType.baseClasses.forall(cls =>
      freq(cls, source, countLiterals = true) >= freq(cls, target, countLiterals = false))

  def validateAt(source: Pattern, target: Pattern, isLeaf: Boolean): Boolean =
    if (isLeaf) validateLeaf(source, target) else validate(source, target)
}
