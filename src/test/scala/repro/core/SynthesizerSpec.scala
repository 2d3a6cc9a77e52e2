package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.benchmark.Benchmarks
import repro.sim.ClxSim

/** §6 end-to-end synthesis (Algorithm 2), including the paper's Table 3
  * and Table 4 tasks and its worked examples.
  */
class SynthesizerSpec extends AnyFunSuite {

  private def p(s: String) = Tokenizer.tokenize(s)

  test("plansFor finds the phone normalization plan (Examples 8/9 machinery)") {
    val plans = Synthesizer.plansFor(p("734.645.8397"), p("(201) 555-0100"), k = 10)
    assert(plans.nonEmpty)
    val vals = p("734.645.8397").split("734.645.8397").get
    assert(plans.head.eval(vals).contains("(734) 645-8397"))
  }

  test("plansFor is empty when alignment is infeasible") {
    assert(Synthesizer.plansFor(p("abc"), p("123"), k = 10).isEmpty)
  }

  test("plans are deduplicated (no equivalent suggestions)") {
    val src = p("12/02/2017")
    val plans = Synthesizer.plansFor(src, p("12/02"), k = 10)
    for (i <- plans.indices; j <- (i + 1) until plans.size)
      assert(!Dedup.equivalent(plans(i), plans(j), src),
        s"${plans(i).render} equivalent to ${plans(j).render}")
  }

  test("synthesize solves at the most general validating level") {
    val strings = Seq("John Smith", "Mary Jones", "Kate Brown", "Anna", "Lisa", "Nina")
    val root = Synthesizer.hierarchyOf(strings)
    val target = Pattern.of(Token(TokType.U, 1), Token(TokType.L, Quant.Plus))
    val res = Synthesizer.synthesize(root, Seq(target))
    // one generalized branch covers all "First Last" shapes
    val fullNameBranches = res.solutions.filter(_.source.size > 2)
    assert(fullNameBranches.size == 1)
    assert(fullNameBranches.head.source.render == "<U>+<L>+' '<U>+<L>+")
  }

  test("noise leaves are reported, not solved (§6.1)") {
    val strings = Seq("734-422-8073", "734-236-3466", "N/A", "N/A")
    val root = Synthesizer.hierarchyOf(strings)
    val res = Synthesizer.synthesize(root, Seq(p("(734) 645-8397")))
    assert(res.noise.nonEmpty)
  }

  test("program leaves noise unchanged and flagged") {
    val strings = Seq("734-422-8073", "N/A", "N/A")
    val res = Synthesizer.fromStrings(strings, Seq(p("(734) 645-8397")))
    val prog = res.program(Seq(p("(734) 645-8397")))
    assert(prog.applyFlagged("N/A") == ("N/A", false))
    assert(prog.applyFlagged("734-422-8073")._2)
  }

  test("Table 3: medical billing codes normalize exactly as the paper") {
    val data = Benchmarks.all.find(_.id == "bf-ex3-cpt").get.data
    val outcome = ClxSim.run(data)
    assert(outcome.perfect, s"failures=${outcome.failures}")
    // the paper's four rows specifically
    val paperRows = Seq(
      "CPT-00350" -> "[CPT-00350]",
      "[CPT-00340" -> "[CPT-00340]",
      "[CPT-11536]" -> "[CPT-11536]",
      "CPT115" -> "[CPT-115]",
    )
    paperRows.foreach { case (in, out) =>
      assert(outcome.program.applyFlagged(in)._1 == out, s"for $in")
    }
  }

  test("Table 3: the selected target is the paper's T = ['[', U+, '-', D+, ']']") {
    val data = Benchmarks.all.find(_.id == "bf-ex3-cpt").get.data
    val targets = ClxSim.chooseTargets(data)
    assert(targets.map(_.render) == Vector("'['<U>+'-'<D>+']'"))
  }

  test("Table 4: name normalization reaches the paper's outputs") {
    val data = Benchmarks.all.find(_.id == "ff-ex9-names").get.data
    val outcome = ClxSim.run(data)
    assert(outcome.perfect, s"failures=${outcome.failures}")
    val paperRows = Seq(
      "Dr. Eran Yahav" -> "Yahav, E.",
      "Fisher, K." -> "Fisher, K.",
      "Bill Gates, Sr." -> "Gates, B.",
      "Oege de Moor" -> "Moor, O.",
    )
    paperRows.foreach { case (in, out) =>
      assert(outcome.program.applyFlagged(in)._1 == out, s"for $in")
    }
  }

  test("programWith honors repair choices") {
    val strings = Seq("938-242-504", "837-123-456", "938", "242")
    val root = Synthesizer.hierarchyOf(strings)
    val target = Pattern.of(Token(TokType.D, 3))
    val res = Synthesizer.synthesize(root, Seq(target))
    val sol = res.solutions.head
    assert(sol.plans.size >= 2)
    val p0 = res.programWith(Seq(target), Map.empty)
    val p1 = res.programWith(Seq(target), Map(sol.source -> 1))
    assert(p0("938-242-504") != p1("938-242-504"))
  }

  test("synthesize skips target patterns themselves") {
    val strings = Seq("123-456", "789-012", "111.222")
    val target = p("123-456")
    val res = Synthesizer.fromStrings(strings, Seq(target))
    assert(!res.solutions.exists(_.source == target))
  }

  test("multi-target synthesis merges candidate plans") {
    val strings = Seq("John Smith, MIT, USA", "Jane Roe, UCLA, USA")
    val root = Synthesizer.hierarchyOf(strings)
    val t1 = Pattern.of(Token(TokType.U, Quant.Plus))
    val res = Synthesizer.synthesize(root, Seq(t1))
    assert(res.solutions.nonEmpty)
    assert(res.solutions.head.plans.nonEmpty)
  }

  test("hierarchyOf merges clusters that collapse under constant discovery") {
    val strings = Seq("AB1", "AB2", "AB3")
    val root = Synthesizer.hierarchyOf(strings)
    assert(root.leaves.map(_.count).sum == 3)
  }

  test("leafClusters reports pattern frequencies (Fig. 3 view)") {
    val strings = Seq("a1", "b2", "c3", "x-y")
    val clusters = Synthesizer.leafClusters(strings)
    assert(clusters.values.sum == 4)
    assert(clusters(Tokenizer.tokenize("a1")) == 3)
  }

  test("suggestion list cap k is honored") {
    val res = Synthesizer.fromStrings(
      Seq("1.2.3.4", "5.6.7.8", "1234"), Seq(p("9.9.9.9")), k = 3)
    res.solutions.foreach(s => assert(s.plans.size <= 3))
  }

  test("paper Example 6 shape: Bill Gates, Sr. branch produces Gates, B.") {
    val data = Benchmarks.all.find(_.id == "ff-ex9-names").get.data
    val outcome = ClxSim.run(data)
    assert(outcome.program.applyFlagged("Sumit Gulwani, Sr.")._1 == "Gulwani, S.")
  }
}
