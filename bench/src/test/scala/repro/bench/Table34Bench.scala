package repro.bench

import repro.SparkSpec
import repro.benchmark.Benchmarks
import repro.core.RegexExplain
import repro.dist.TransformSpark
import repro.sim.ClxSim

/** Tables 3 & 4 (§5): the paper's two worked normalization examples,
  * reproduced end-to-end through the full CLX pipeline (driver-side
  * synthesis + Spark UDF application), printing raw vs transformed rows
  * next to the paper's.
  */
class Table34Bench extends SparkSpec {

  private def reproduce(taskId: String, paperRows: Seq[(String, String)], title: String): Unit = {
    import spark.implicits._
    val task = Benchmarks.all.find(_.id == taskId).get
    val outcome = ClxSim.run(task.data)
    assert(outcome.perfect, s"$taskId: failures=${outcome.failures}")

    val df = task.data.map(_._1).toDF("raw")
    val out = TransformSpark.transform(df, "raw", outcome.program).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap

    println(s"\n== $title ==")
    println(f"${"Raw data"}%-18s ${"Transformed"}%-18s ${"Paper"}%-18s")
    paperRows.foreach { case (in, expect) =>
      println(f"$in%-18s ${out(in)}%-18s $expect%-18s")
      assert(out(in) == expect, s"row '$in'")
    }
    println("-- inferred Replace operations (Fig. 4 form) --")
    RegexExplain.explainProgram(outcome.program).foreach(r => println("  " + r.natural))
  }

  test("Table 3: normalizing messy medical billing codes (BlinkFill Ex. 3)") {
    reproduce("bf-ex3-cpt", Seq(
      "CPT-00350" -> "[CPT-00350]",
      "[CPT-00340" -> "[CPT-00340]",
      "[CPT-11536]" -> "[CPT-11536]",
      "CPT115" -> "[CPT-115]",
    ), "Table 3: medical billing codes")
  }

  test("Table 4: normalizing messy employee names (FlashFill Ex. 9)") {
    reproduce("ff-ex9-names", Seq(
      "Dr. Eran Yahav" -> "Yahav, E.",
      "Fisher, K." -> "Fisher, K.",
      "Bill Gates, Sr." -> "Gates, B.",
      "Oege de Moor" -> "Moor, O.",
    ), "Table 4: employee names")
  }

  test("Table 3 target equals the paper's T = ['[', U+, '-', D+, ']']") {
    val targets = ClxSim.chooseTargets(Benchmarks.all.find(_.id == "bf-ex3-cpt").get.data)
    assert(targets.map(_.render) == Vector("'['<U>+'-'<D>+']'"))
  }
}
