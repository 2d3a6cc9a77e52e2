package repro.jobs

import repro.sim.Comparison

/** §7.4 user-effort simulation (Table 7): runs the three simulated lazy
  * users over all 47 benchmark tasks and prints per-task Steps plus the
  * aggregated wins/ties/losses and expressivity counts. Pure driver-side
  * computation; `spark-submit --class repro.jobs.Table7Job` works but no
  * cluster resources are used.
  */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val s = Comparison.summary()
    println(f"${"task"}%-28s ${"src"}%-10s ${"CLX"}%5s ${"FF"}%5s ${"RR"}%5s  clxOK ffOK rrOK")
    s.results.foreach { r =>
      println(f"${r.task.id}%-28s ${r.task.source}%-10s ${r.clxSteps}%5d ${r.ffSteps}%5d ${r.rrSteps}%5d  " +
        f"${r.clx.perfect}%-5s ${r.ff.perfect}%-5s ${r.rr.perfect}%-5s " +
        f"(sel=${r.clx.selections} rep=${r.clx.repairs} fail=${r.clx.failures})")
    }
    println()
    println(s"Table 7 | vs. FlashFill    : CLX wins/tie/loses = ${s.vsFlashFill} (paper 17/17/13)")
    println(s"Table 7 | vs. RegexReplace : CLX wins/tie/loses = ${s.vsRegexReplace} (paper 33/12/2)")
    println(s"Expressivity | CLX ${s.clxPerfect}/${s.n} (paper 42/47)  FlashFill ${s.ffPerfect}/${s.n} (paper 45/47)  RegexReplace ${s.rrPerfect}/${s.n} (paper 46/47)")
  }
}
