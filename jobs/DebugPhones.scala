package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.sim.ClxSim

/** Debug aid for the messyPhones end-to-end path. */
object DebugPhones {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder().master("local[2]").appName("debug")
      .config("spark.ui.enabled", false).getOrCreate()
    val local = SynthData.messyPhones(spark, 400, 6).collect()
      .map(r => (r.getString(0), r.getString(1))).toVector
    println("sample rows:")
    local.take(12).foreach { case (raw, exp) => println(s"  '$raw' -> '$exp'") }
    println("distinct raw formats: " + local.map(r => repro.core.Tokenizer.tokenize(r._1).render).distinct.mkString(" | "))
    val o = ClxSim.run(local)
    println(s"targets: ${o.targets.map(_.render)}")
    println(o.program.render)
    println(s"sel=${o.selections} rep=${o.repairs} fail=${o.failures}")
    local.filter { case (in, out) => o.program.applyFlagged(in)._1 != out }.take(8)
      .foreach { case (in, out) => println(s"  FAIL '$in' -> '${o.program.applyFlagged(in)._1}' want '$out'") }
    spark.stop()
  }
}
