package repro.dist

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.core.UniFi._

/** Distributed program application (per-partition UDF via withColumn) and
  * pattern-level verification; the regexp-replace explanation is checked
  * against the UDF output through the DuckDB oracle (RE2 flavor).
  */
class TransformSparkSpec extends SparkSpec {

  import org.apache.spark.sql.DataFrame
  private def df(strings: Seq[String]): DataFrame = {
    import spark.implicits._
    strings.toDF("s")
  }

  private val src = Tokenizer.tokenize("734.645.8397")
  private val target = Tokenizer.tokenize("(734) 645-8397")
  private val plan = Plan(Vector(
    ConstStr("("), Extract(1), ConstStr(") "), Extract(3), ConstStr("-"), Extract(5)))
  private val prog = Program(Vector(target), Vector(Branch(src, plan)))

  test("transform rewrites matching records and flags them") {
    val out = TransformSpark.transform(df(Seq("201.555.0100", "N/A")), "s", prog).collect()
    val m = out.map(r => r.getString(0) -> (r.getString(1), r.getBoolean(2))).toMap
    assert(m("201.555.0100") == (("(201) 555-0100", true)))
    assert(m("N/A") == (("N/A", false)))
  }

  test("target-form records pass through flagged as matched") {
    val out = TransformSpark.transform(df(Seq("(555) 123-4567")), "s", prog).collect()
    assert(out.head.getString(1) == "(555) 123-4567")
    assert(out.head.getBoolean(2))
  }

  test("verifyPatterns clusters the output column") {
    val t = TransformSpark.transform(df(Seq("201.555.0100", "202.555.0100", "N/A")), "s", prog)
    val v = TransformSpark.verifyPatterns(t, "transformed", Seq(target)).collect()
    val byPat = v.map(r => (r.getString(0), r.getLong(1), r.getBoolean(2))).toList
    assert(byPat.contains((target.render, 2L, true)))
    assert(byPat.exists { case (p, n, isT) => p != target.render && n == 1L && !isT })
  }

  test("allVerified holds when every matched record reaches the target pattern") {
    val t = TransformSpark.transform(df(Seq("201.555.0100", "N/A")), "s", prog)
    assert(TransformSpark.allVerified(t, "transformed", "matched", Seq(target)))
  }

  test("allVerified fails for a broken program") {
    val bad = Program(Vector(target), Vector(Branch(src, Plan(Vector(Extract(1))))))
    val t = TransformSpark.transform(df(Seq("201.555.0100")), "s", bad)
    assert(!TransformSpark.allVerified(t, "transformed", "matched", Seq(target)))
  }

  test("oracle: UDF transform equals DuckDB regexp_replace of the explanation") {
    val replace = RegexExplain.explain(prog.branches.head)
    val data = df(Seq("201.555.0100", "944.123.9876", "000.111.2222"))
    val sparkOut = TransformSpark.transform(data, "s", prog)
      .select(col("s"), col("transformed") as "out")
    // NB: standard SQL string literals do not process backslashes, so the
    // RE2 replacement goes in verbatim.
    Oracle.assertEquivalent(
      sparkOut,
      s"SELECT s, regexp_replace(s, '${replace.regex}', '${replace.re2Replacement}') AS out FROM t",
      "t" -> data,
    )
  }

  test("oracle: multi-branch program as chained DuckDB replaces") {
    val src2 = Tokenizer.tokenize("734-645-8397")
    val plan2 = Plan(Vector(
      ConstStr("("), Extract(1), ConstStr(") "), Extract(3), ConstStr("-"), Extract(5)))
    val prog2 = Program(Vector(target), Vector(Branch(src, plan), Branch(src2, plan2)))
    val replaces = RegexExplain.explainProgram(prog2)
    val data = df(Seq("201.555.0100", "201-555-0100", "(9) 9"))
    val sql = replaces.foldLeft("s") { (expr, r) =>
      s"regexp_replace($expr, '${r.regex}', '${r.re2Replacement}')"
    }
    val sparkOut = TransformSpark.transform(data, "s", prog2)
      .select(col("s"), col("transformed") as "out")
    Oracle.assertEquivalent(sparkOut, s"SELECT s, $sql AS out FROM t", "t" -> data)
  }

  test("Catalyst-native path: transformViaRegex equals the UDF path") {
    val data = df(Seq("201.555.0100", "944.123.9876", "(555) 123-4567", "N/A"))
    val viaUdf = TransformSpark.transform(data, "s", prog)
      .select(col("s"), col("transformed") as "out")
    val viaRegex = TransformSpark.transformViaRegex(data, "s", prog)
      .select(col("s"), col("transformed") as "out")
    val a = viaUdf.collect().map(_.toString).sorted
    val b = viaRegex.collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("Catalyst-native path agrees with the DuckDB oracle") {
    val data = df(Seq("201.555.0100", "123.456.7890"))
    val replace = RegexExplain.explain(prog.branches.head)
    val viaRegex = TransformSpark.transformViaRegex(data, "s", prog)
      .select(col("s"), col("transformed") as "out")
    Oracle.assertEquivalent(
      viaRegex,
      s"SELECT s, regexp_replace(s, '${replace.regex}', '${replace.re2Replacement}') AS out FROM t",
      "t" -> data,
    )
  }

  test("transform handles null input") {
    import spark.implicits._
    val data = Seq(Some("201.555.0100"), None).toDF("s")
    val out = TransformSpark.transform(data, "s", prog).collect()
    assert(out.exists(r => r.isNullAt(1) || r.getString(1) == null || r.get(1) == null))
  }
}
