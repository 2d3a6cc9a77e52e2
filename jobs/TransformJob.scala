package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.SynthData
import repro.core.{RegexExplain, Synthesizer}
import repro.dist.{PatternClusteringSpark, TransformSpark}

/** spark-submit entrypoint for the full CLX pipeline (§3.2): cluster →
  * label (dominant already-normalized pattern) → synthesize → transform →
  * pattern-level verify, printing the explanation (Fig. 4) and the output
  * pattern listing (Fig. 2).
  *
  * Usage: spark-submit --class repro.jobs.TransformJob repro.jar [rows] [formats]
  */
object TransformJob {
  def main(args: Array[String]): Unit = {
    val rows = args.headOption.map(_.toLong).getOrElse(100000L)
    val formats = args.lift(1).map(_.toInt).getOrElse(6)
    val spark = SparkSession.builder().appName("clx-transform")
      .config("spark.sql.shuffle.partitions", 64).getOrCreate()
    try {
      val data = SynthData.messyPhones(spark, rows, formats).cache()
      val hier = PatternClusteringSpark.hierarchy(data, "raw")
      val sample = data.filter(col("raw") === col("expected"))
        .select("raw").limit(100).collect().map(_.getString(0)).toSeq
      val targets = Synthesizer.leafClusters(sample).keys.toVector
      println(s"label: target pattern(s) = ${targets.map(_.renderNatural).mkString(" | ")}")

      val result = Synthesizer.synthesize(hier, targets)
      val prog = result.program(targets)
      println("\n== Inferred transformation (Fig. 4) ==")
      RegexExplain.explainProgram(prog).foreach(r => println("  " + r.natural))

      val out = TransformSpark.transform(data, "raw", prog).cache()
      println("\n== Output pattern clusters (Fig. 2) ==")
      TransformSpark.verifyPatterns(out, "transformed", targets).collect().foreach { r =>
        println(f"${r.getString(0)}%-40s ${r.getLong(1)}%10d   target=${r.getBoolean(2)}")
      }
      val nCorrect = out.filter(col("transformed") === col("expected")).count()
      println(s"\nground truth: $nCorrect/$rows records exactly correct")
    } finally spark.stop()
  }
}
