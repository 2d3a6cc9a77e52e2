package repro.core

import UniFi.{ConstStr, Extract, Plan}

/** §6.3 Minimum Description Length plan ranking (Eq. 3–6).
  *
  * L(E,T)   = L(E) + L(T|E)
  * L(E)     = |E| · log₂ m          (m = #distinct operation *types* in E)
  * L(T|E)   = Σ log₂ L(fᵢ)          where
  *   L(Extract)      = |P_cand|²    (two token indices into the source)
  *   L(ConstStr(s̃))  = 95^|s̃|       (printable characters)
  *
  * Logs are base 2; log₂ 1 = 0, matching the paper's Example 9 where a
  * single-op plan contributes no model cost.
  */
object Mdl {

  private def log2(x: Double): Double = math.log(x) / math.log(2)

  /** Model description length L(E) (Eq. 4). */
  def modelLength(plan: Plan): Double = {
    val distinctTypes = plan.exprs.map {
      case _: Extract  => "extract"
      case _: ConstStr => "conststr"
    }.distinct.size
    if (plan.exprs.isEmpty) 0.0 else plan.exprs.size * log2(math.max(1, distinctTypes))
  }

  /** Data description length L(T|E) (Eq. 5), given the source pattern size. */
  def dataLength(plan: Plan, sourceSize: Int): Double =
    plan.exprs.map {
      case _: Extract  => log2(math.max(1, sourceSize.toDouble * sourceSize))
      case ConstStr(s) => s.length * log2(95.0)
    }.sum

  /** Total description length L(E,T) (Eq. 3). */
  def length(plan: Plan, sourceSize: Int): Double =
    modelLength(plan) + dataLength(plan, sourceSize)

  /** Occam-style tie-break among equal-DL plans: penalize plans that reuse
    * the same source range twice (2 per adjacent repeat) or jump backwards
    * in the source (1 per adjacent inversion). Equal-DL alignments are
    * otherwise arbitrary; preferring order-preserving, non-repeating
    * extractions mirrors how humans read transformations and is what makes
    * the default plan usually correct (§6.3, Appendix E).
    */
  def orderPenalty(plan: Plan): Int = {
    val ex = plan.exprs.collect { case e: Extract => e }
    ex.sliding(2).collect { case Seq(a, b) =>
      if (a == b) 2 else if (b.i <= a.j) 1 else 0
    }.sum
  }

  /** Rank plans by DL ascending; ties broken deterministically. */
  def rank(plans: Seq[Plan], sourceSize: Int): Vector[Plan] =
    plans.toVector.sortBy(p => (length(p, sourceSize), p.exprs.size, orderPenalty(p), p.render))
}
