package repro.core

/** §4.1 "Find Constant Tokens".
  *
  * Within a pattern cluster, a token position whose underlying substring is
  * identical across every member string is re-labeled as a literal token
  * with that value (e.g. `<U>3` → `'CPT'`).
  *
  * Adjacent literals are deliberately NOT merged into one token (the
  * paper's `'Dr.'` display): merging `'CPT'` with a neighboring `'-'`
  * would destroy the token boundary that alignment needs to extract the
  * `'CPT'` part into a `<U>+` target token. `mergeLiterals` remains
  * available for display purposes.
  *
  * A minimum cluster support (default 2) prevents a singleton cluster from
  * degenerating into one all-literal pattern.
  */
object ConstantDiscovery {

  /** Per-position value summary of a cluster: (#distinct values, a value). */
  final case class PositionStat(distinct: Long, value: String)

  /** Rewrite `pattern` given per-position stats and the cluster size.
    *
    * This is the driver-side half; the stats can come from a local pass
    * (`discoverLocal`) or from a distributed aggregation
    * (see `repro.dist.PatternClusteringSpark`).
    */
  def applyStats(pattern: Pattern, stats: Map[Int, PositionStat], clusterSize: Long,
                 minSupport: Int = 2): Pattern = {
    if (clusterSize < minSupport) return pattern
    val upgraded = pattern.tokens.zipWithIndex.map { case (t, i) =>
      if (t.isLiteral) t
      else stats.get(i) match {
        case Some(PositionStat(1, v)) => Token.lit(v)
        case _                        => t
      }
    }
    Pattern(upgraded)
  }

  /** Local (in-memory) constant discovery over one cluster's strings. */
  def discoverLocal(pattern: Pattern, strings: Seq[String], minSupport: Int = 2): Pattern = {
    if (strings.isEmpty) return pattern
    val splits = strings.flatMap(pattern.split)
    if (splits.size != strings.size) return pattern // defensive
    val stats = pattern.tokens.indices.map { i =>
      val vals = splits.map(_(i)).distinct
      i -> PositionStat(vals.size.toLong, vals.head)
    }.toMap
    applyStats(pattern, stats, strings.size.toLong, minSupport)
  }

  /** Merge runs of adjacent literal tokens into a single literal token. */
  def mergeLiterals(p: Pattern): Pattern = {
    val out = Vector.newBuilder[Token]
    var buf = new StringBuilder
    def flush(): Unit = if (buf.nonEmpty) { out += Token.lit(buf.toString); buf = new StringBuilder }
    p.tokens.foreach {
      case Token(TokType.Lit(v), _) => buf.append(v)
      case t                        => flush(); out += t
    }
    flush()
    Pattern(out.result())
  }
}
