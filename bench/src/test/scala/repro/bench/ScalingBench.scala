package repro.bench

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthData}
import repro.core.Synthesizer
import repro.dist.{PatternClusteringSpark, TransformSpark}

/** Machine-side analog of the §7.2 verification-effort study (Fig. 11/12).
  *
  * The paper's claim: CLX verification cost scales with the number of
  * *patterns*, not records — when the data grew 30×, CLX user verification
  * time grew 1.3× (vs 11.4× for FlashFill) because the user inspects a
  * constant-size pattern list. We verify the mechanism at benchmark scale:
  * the pattern list the user must verify stays constant from 10 rows to
  * 1M rows (SF≈0.1-scale column), while the pipeline still transforms and
  * pattern-verifies everything correctly. Wall-clock times are printed for
  * the record (machine time is the cluster's business, not the user's).
  */
class ScalingBench extends SparkSpec {

  private def timed[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  private def pipeline(rows: Long, nFormats: Int): (Long, Long, Double, Double, Double) = {
    val data = SynthData.messyPhones(spark, rows, nFormats).cache()
    data.count()

    val (hier, tCluster) = timed(PatternClusteringSpark.hierarchy(data, "raw"))
    val patterns = hier.leaves.size.toLong

    val sampleCorrect = data.filter(col("raw") === col("expected"))
      .select("raw").limit(100).collect().map(_.getString(0)).toSeq
    val targets = Synthesizer.leafClusters(sampleCorrect).keys.toVector
    val (result, tSynth) = timed(Synthesizer.synthesize(hier, targets))
    val prog = result.program(targets)

    val (nCorrect, tTransform) = timed {
      val out = TransformSpark.transform(data, "raw", prog)
      out.filter(col("transformed") === col("expected")).count()
    }
    data.unpersist()
    (patterns, nCorrect, tCluster, tSynth, tTransform)
  }

  test("Fig. 11/12 analog: pattern-level verification cost is row-count invariant") {
    println("\n== Scaling (Fig. 11/12 analog): messy phones, 6 formats ==")
    println(f"${"rows"}%10s ${"patterns"}%9s ${"correct"}%10s ${"cluster(s)"}%11s ${"synth(s)"}%9s ${"apply(s)"}%9s")
    val sizes = Seq(10000L, 100000L, 1000000L)
    val out = sizes.map { n =>
      val (p, c, t1, t2, t3) = pipeline(n, 6)
      println(f"$n%10d $p%9d $c%10d $t1%11.2f $t2%9.2f $t3%9.2f")
      (n, p, c)
    }
    // the user-facing verification surface (#patterns) is constant
    assert(out.map(_._2).distinct.size == 1)
    // and the transformation is exactly correct at every scale
    out.foreach { case (n, _, correct) => assert(correct == n, s"at $n rows") }
  }

  test("paper's 10(2)/100(4)/300(6) cases: patterns grow with heterogeneity, not size") {
    println("\n== §7.2 test cases ==")
    val cases = Seq((300L, 2), (1000L, 4), (3000L, 6))
    val patterns = cases.map { case (n, k) =>
      val (p, c, _, _, _) = pipeline(n, k)
      println(s"  rows=$n formats=$k -> patterns=$p correct=$c/$n")
      assert(c == n)
      p
    }
    assert(patterns == Seq(2L, 4L, 6L))
  }
}
