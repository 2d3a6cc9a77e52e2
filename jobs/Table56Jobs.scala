package repro.jobs

import repro.benchmark.Benchmarks

/** Prints Table 5 (explainability task statistics). Driver-side only. */
object Table5Job {
  def main(args: Array[String]): Unit = {
    println(f"${"Task"}%-7s ${"Size"}%5s ${"AvgLen"}%8s ${"MaxLen"}%7s  DataType")
    Benchmarks.table5Tasks.foreach { case (name, t) =>
      println(f"$name%-7s ${t.size}%5d ${t.avgLen}%8.1f ${t.maxLen}%7d  ${t.dataType}")
    }
  }
}

/** Prints Table 6 (benchmark corpus statistics per source). */
object Table6Job {
  def main(args: Array[String]): Unit = {
    println(f"${"Source"}%-11s ${"#tests"}%7s ${"AvgSize"}%8s ${"AvgLen"}%8s ${"MaxLen"}%7s")
    Seq("SyGuS", "FlashFill", "BlinkFill", "PredProg", "Prose").foreach { src =>
      val ts = Benchmarks.bySource(src)
      val avgSize = ts.map(_.size).sum.toDouble / ts.size
      val avgLen = ts.map(t => t.avgLen * t.size).sum / ts.map(_.size).sum
      println(f"$src%-11s ${ts.size}%7d $avgSize%8.1f $avgLen%8.1f ${ts.map(_.maxLen).max}%7d")
    }
    val all = Benchmarks.all
    println(f"${"Overall"}%-11s ${all.size}%7d ${all.map(_.size).sum.toDouble / all.size}%8.1f " +
      f"${all.map(t => t.avgLen * t.size).sum / all.map(_.size).sum}%8.1f ${all.map(_.maxLen).max}%7d")
  }
}
