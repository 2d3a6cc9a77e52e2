package repro.jobs

import repro.benchmark.Benchmarks
import repro.flashfill.FlashFillSynth

/** Debug aid: trace the FlashFill lazy-user loop on one task. */
object DebugFF {
  def main(args: Array[String]): Unit = {
    val id = args.headOption.getOrElse("sygus-phone-10-long")
    val data = Benchmarks.all.find(_.id == id).get.data
    var examples = Vector.empty[(String, String)]
    var done = false
    while (!done && examples.size < 30) {
      val prog = FlashFillSynth.learn(examples)
      data.find { case (in, out) => prog(in) != out } match {
        case Some((in, out)) =>
          println(s"fail: '$in' -> got '${FlashFillSynth.learn(examples)(in)}' want '$out'")
          if (examples.contains((in, out))) { println("  (already an example!)"); done = true }
          else examples :+= ((in, out))
        case None => done = true
      }
    }
    println(s"total examples: ${examples.size}")
    val prog = FlashFillSynth.learn(examples)
    prog.branches.foreach(b =>
      println(s"branch gen=${b.general.render} exact=${b.exact.map(_.map(_.render))} kw=${b.keyword} plan=${b.plan.atoms}"))
  }
}
