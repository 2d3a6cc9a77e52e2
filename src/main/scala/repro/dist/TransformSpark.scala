package repro.dist

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core._

/** Distributed application of a synthesized UniFi program (§5–6) and the
  * pattern-level verification the CLX paradigm gives the user (Fig. 2).
  *
  * The program is captured in a UDF closure applied per record via
  * `withColumn`; branch regexes are compiled lazily once per executor JVM
  * (the `Pattern.compiled` lazy val), so per-partition work is a cheap
  * match-and-extract. Records matching no branch are flagged, not dropped
  * (§6.1 "left unchanged and flagged for additional review").
  */
object TransformSpark {

  /** Apply `prog` to `df(col)`, adding `out` and `outFlag` columns. */
  def transform(df: DataFrame, col: String, prog: UniFi.Program,
                out: String = "transformed", flag: String = "matched"): DataFrame = {
    val f = udf { (s: String) =>
      if (s == null) null else {
        val (o, ok) = prog.applyFlagged(s)
        (o, ok)
      }
    }
    df.withColumn("_clx", f(df(col)))
      .withColumn(out, column("_clx._1"))
      .withColumn(flag, column("_clx._2"))
      .drop("_clx")
  }

  /** Catalyst-native execution of the program's regexp-replace
    * *explanation* (§5): no UDF — the branches become nested
    * `regexp_replace` column expressions (Java `$n` flavor), guarded so
    * target-form values pass through untouched. This is exactly the
    * recipe a user would paste into a SQL engine after verifying the
    * Fig. 4 operations; `TransformSparkSpec` oracle-checks it against the
    * UniFi UDF path. Because every branch regex is anchored to a full
    * source pattern and branch outputs are target-formed, the sequential
    * chain coincides with first-match-wins on CLX-synthesized programs.
    */
  def transformViaRegex(df: DataFrame, col: String, prog: UniFi.Program,
                        out: String = "transformed"): DataFrame = {
    val replaces = RegexExplain.explainProgram(prog)
    val chained = replaces.foldLeft(df(col)) { (expr, r) =>
      regexp_replace(expr, r.regex, r.javaReplacement)
    }
    val isTarget = prog.targets.map(t => df(col).rlike(t.groupedRegex))
      .reduceOption(_ || _).getOrElse(lit(false))
    df.withColumn(out, when(isTarget, df(col)).otherwise(chained))
  }

  /** Pattern-level verification of the transformed column: cluster the
    * output and report, per output pattern, its count and whether it is a
    * selected target pattern — the mechanical form of the user's Fig. 2
    * check.
    */
  def verifyPatterns(transformed: DataFrame, outCol: String, targets: Seq[Pattern]): DataFrame = {
    val targetSet = targets.map(_.render).toSet
    val isTarget = udf((p: String) => targetSet.contains(p))
    PatternClusteringSpark.withPattern(transformed, outCol, "out_pattern")
      .groupBy("out_pattern")
      .agg(count(lit(1)) as "n")
      .withColumn("is_target", isTarget(column("out_pattern")))
      .orderBy(desc("n"), asc("out_pattern"))
  }

  /** True iff every record that matched a branch now sits in a target
    * pattern — the success criterion of a pattern-level verification pass.
    */
  def allVerified(transformed: DataFrame, outCol: String, flagCol: String,
                  targets: Seq[Pattern]): Boolean = {
    val targetSet = targets.map(_.render).toSet
    PatternClusteringSpark
      .withPattern(transformed.filter(column(flagCol)), outCol, "out_pattern")
      .filter(!column("out_pattern").isin(targetSet.toSeq: _*))
      .isEmpty
  }
}
