package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.SynthData
import repro.core.Synthesizer
import repro.dist.{PatternClusteringSpark, TransformSpark}

/** spark-submit entrypoint for the Fig. 11/12 analog: runs the full CLX
  * pipeline at several row counts and prints the (constant) pattern count
  * plus wall-clock phase times.
  *
  * Usage: spark-submit --class repro.jobs.ScalingJob repro.jar [maxRows]
  */
object ScalingJob {
  def main(args: Array[String]): Unit = {
    val maxRows = args.headOption.map(_.toLong).getOrElse(1000000L)
    val spark = SparkSession.builder().appName("clx-scaling")
      .config("spark.sql.shuffle.partitions", 64).getOrCreate()
    def timed[A](f: => A): (A, Double) = {
      val t0 = System.nanoTime(); val a = f; (a, (System.nanoTime() - t0) / 1e9)
    }
    try {
      println(f"${"rows"}%10s ${"patterns"}%9s ${"correct"}%10s ${"cluster(s)"}%11s ${"apply(s)"}%9s")
      Iterator.iterate(maxRows / 100)(_ * 10).takeWhile(_ <= maxRows).foreach { n =>
        val data = SynthData.messyPhones(spark, n, 6).cache()
        data.count()
        val (hier, t1) = timed(PatternClusteringSpark.hierarchy(data, "raw"))
        val sample = data.filter(col("raw") === col("expected"))
          .select("raw").limit(100).collect().map(_.getString(0)).toSeq
        val targets = Synthesizer.leafClusters(sample).keys.toVector
        val prog = Synthesizer.synthesize(hier, targets).program(targets)
        val (ok, t2) = timed {
          TransformSpark.transform(data, "raw", prog)
            .filter(col("transformed") === col("expected")).count()
        }
        println(f"$n%10d ${hier.leaves.size}%9d $ok%10d $t1%11.2f $t2%9.2f")
        data.unpersist()
      }
    } finally spark.stop()
  }
}
