package repro.bench

import repro.{SparkSpec, SynthData}
import repro.sim.{ClxSim, FlashFillSim, RegexReplaceSim}

/** §7.2 verification-effort study, simulated-Step analog.
  *
  * The paper's 10(2)/100(4)/300(6) phone cases (rows(patterns)) showed
  * CLX user verification time growing 1.3× over a 30× data increase while
  * FlashFill's grew 11.4×. Human seconds are not simulable; the
  * machine-measurable counterpart is interaction Steps: CLX interactions
  * are pattern-level (constant in rows), FlashFill's are instance-level
  * (grow with size and heterogeneity). Data is the synthetic stand-in for
  * the NYC OpenData phone column (DESIGN.md §3).
  */
class Sec72Bench extends SparkSpec {

  private def testCase(rows: Long, formats: Int): Vector[(String, String)] =
    SynthData.messyPhones(spark, rows, formats).collect()
      .map(r => (r.getString(0), r.getString(1))).toVector

  test("10(2) / 100(4) / 300(6): CLX Steps stay flat while FlashFill's grow") {
    val cases = Seq((10L, 2), (100L, 4), (300L, 6))
    println("\n== §7.2 analog: interaction Steps on the messy phone column ==")
    println(f"${"case"}%-10s ${"CLX"}%5s ${"FlashFill"}%10s ${"RegexReplace"}%13s")
    val rowsOut = cases.map { case (n, k) =>
      val data = testCase(n, k)
      val clx = ClxSim.run(data)
      val ff = FlashFillSim.run(data)
      val rr = RegexReplaceSim.run(data)
      assert(clx.perfect, s"$n($k): CLX failures=${clx.failures}")
      assert(ff.perfect, s"$n($k): FF failures=${ff.failures}")
      println(f"${s"$n($k)"}%-10s ${clx.steps}%5d ${ff.steps}%10d ${rr.steps}%13d")
      (clx.steps, ff.steps, rr.steps)
    }
    val (clxS, ffS, rrS) = (rowsOut.map(_._1), rowsOut.map(_._2), rowsOut.map(_._3))
    // paper: CLX interaction cost grows much slower than FlashFill's
    // (1.2× vs 9.1× completion time over the 30× size increase)
    val clxGrowth = clxS.last.toDouble / clxS.head
    val ffGrowth = ffS.last.toDouble / ffS.head
    println(f"growth 10(2)→300(6): CLX ${clxGrowth}%.1f× [paper 1.2×], " +
      f"FlashFill ${ffGrowth}%.1f× [paper 9.1×]")
    assert(clxGrowth <= 2.0, s"CLX growth $clxGrowth")
    assert(ffGrowth >= 2.0, s"FF growth $ffGrowth")
    assert(ffGrowth > clxGrowth)
    // and RegexReplace costs consistently more than CLX (Fig. 11a shape)
    rrS.zip(clxS).foreach { case (rr, clx) => assert(rr >= clx) }
  }
}
