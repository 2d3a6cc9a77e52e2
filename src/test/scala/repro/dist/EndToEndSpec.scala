package repro.dist

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.core._
import repro.sim.ClxSim

/** Full CLX pipeline over Spark: cluster → label → synthesize → transform →
  * pattern-level verify, on the messy phone column (the §7.2 workload).
  */
class EndToEndSpec extends SparkSpec {

  private def runPipeline(rows: Long, nFormats: Int): (Long, Long) = {
    val data = SynthData.messyPhones(spark, rows, nFormats).cache()

    // Cluster (distributed) and label: the target pattern is the cluster
    // whose records already look normalized — here derived from a sample
    // of the dominant format, as the simulated user would select it.
    val hierarchy = PatternClusteringSpark.hierarchy(data, "raw")
    val sampleCorrect = data.filter(col("raw") === col("expected"))
      .select("raw").limit(200).collect().map(_.getString(0)).toSeq
    val targets = Synthesizer.leafClusters(sampleCorrect).keys.toVector

    // Synthesize and transform (per-partition UDF via withColumn).
    val result = Synthesizer.synthesize(hierarchy, targets)
    val prog = result.program(targets)
    val out = TransformSpark.transform(data, "raw", prog).cache()

    // Pattern-level verification plus exact ground-truth check.
    assert(TransformSpark.allVerified(out, "transformed", "matched", targets))
    val correct = out.filter(col("transformed") === col("expected")).count()
    val matched = out.filter(col("matched")).count()
    data.unpersist(); out.unpersist()
    (correct, matched)
  }

  test("end-to-end on 2 formats (the paper's 10(2) case, scaled)") {
    val (correct, matched) = runPipeline(300, 2)
    assert(correct == 300 && matched == 300)
  }

  test("end-to-end on 4 formats (the 100(4) case, scaled)") {
    val (correct, matched) = runPipeline(1000, 4)
    assert(correct == 1000 && matched == 1000)
  }

  test("end-to-end on 6 formats (the 300(6) case, scaled)") {
    val (correct, matched) = runPipeline(3000, 6)
    assert(correct == 3000 && matched == 3000)
  }

  test("pattern count stays constant as rows grow (the verification-effort claim)") {
    val small = PatternClusteringSpark.clusterCounts(
      SynthData.messyPhones(spark, 500, 6), "raw").count()
    val large = PatternClusteringSpark.clusterCounts(
      SynthData.messyPhones(spark, 15000, 6), "raw").count()
    assert(small == large) // user verifies patterns, not rows
  }

  test("Catalyst-native regexp_replace pipeline matches ground truth at scale") {
    val data = SynthData.messyPhones(spark, 2000, 6).cache()
    val hierarchy = PatternClusteringSpark.hierarchy(data, "raw")
    val sample = data.filter(col("raw") === col("expected"))
      .select("raw").limit(100).collect().map(_.getString(0)).toSeq
    val targets = Synthesizer.leafClusters(sample).keys.toVector
    val prog = Synthesizer.synthesize(hierarchy, targets).program(targets)
    val out = TransformSpark.transformViaRegex(data, "raw", prog)
    assert(out.filter(col("transformed") === col("expected")).count() == 2000)
    data.unpersist()
  }

  test("driver-side sim agrees with the Spark pipeline on correctness") {
    val local = SynthData.messyPhones(spark, 400, 6).collect()
      .map(r => (r.getString(0), r.getString(1))).toVector
    val outcome = ClxSim.run(local)
    assert(outcome.perfect, s"failures=${outcome.failures}")
    assert(outcome.selections == 1)
  }
}
