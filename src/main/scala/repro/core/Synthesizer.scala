package repro.core

import Hierarchy.PNode
import UniFi.{Plan, Program, Branch}

/** §6 program synthesis (Algorithm 2).
  *
  * Traverses the pattern cluster hierarchy top-down; a node that passes
  * `validate` against some target is solved (aligned, plans ranked by MDL
  * and deduplicated) and its subtree is not descended; otherwise its
  * children are enqueued. Unsolvable leaves are reported as noise — their
  * strings are "left unchanged and flagged for additional review" (§6.1).
  */
object Synthesizer {

  /** Ranked transformation plans for one solved source pattern.
    *
    * `plans` are MDL-ranked and deduplicated, capped at `k`; `plans.head`
    * is the default plan, the rest are the repair suggestions (§6.4).
    */
  final case class SourceSolution(source: Pattern, plans: Vector[Plan]) {
    def default: Plan = plans.head
  }

  final case class Result(solutions: Vector[SourceSolution], noise: Vector[Pattern]) {
    /** Program using every solution's default plan. */
    def program(targets: Seq[Pattern]): Program =
      Program(targets.toVector, solutions.map(s => Branch(s.source, s.default)))

    /** Program with per-source plan choices (after repair). `choices` maps
      * source pattern → index into the ranked plan list.
      */
    def programWith(targets: Seq[Pattern], choices: Map[Pattern, Int]): Program =
      Program(
        targets.toVector,
        solutions.map { s =>
          val i = choices.getOrElse(s.source, 0)
          Branch(s.source, s.plans(math.min(i, s.plans.size - 1)))
        },
      )
  }

  /** Rank-and-dedup the plans of one (source, target) alignment. */
  def plansFor(source: Pattern, target: Pattern, k: Int): Vector[Plan] = {
    val dag = Alignment.align(target, source)
    if (!dag.isFeasible) Vector.empty
    else Dedup.dedup(Mdl.rank(dag.allPlans(), source.size), source, maxKeep = k)
  }

  /** Algorithm 2 over a hierarchy root and the selected target patterns.
    *
    * With several targets, a source's candidate plans are the union over
    * targets, re-ranked by MDL (ties by target cluster order as given).
    */
  def synthesize(root: PNode, targets: Seq[Pattern], k: Int = 10): Result = {
    val targetSet = targets.toSet
    val solutions = Vector.newBuilder[SourceSolution]
    val noise = Vector.newBuilder[Pattern]
    val queue = scala.collection.mutable.Queue[PNode](root)

    while (queue.nonEmpty) {
      val node = queue.dequeue()
      val p = node.pattern
      if (p.isEmpty) queue.enqueueAll(node.children) // synthetic root
      else if (targetSet.contains(p)) () // already in a desired form
      else {
        val plans: Vector[Plan] =
          if (targets.exists(t => Validate.validateAt(p, t, node.isLeaf))) {
            val all = targets.flatMap { t =>
              if (Validate.validateAt(p, t, node.isLeaf)) plansFor(p, t, k) else Vector.empty
            }
            Dedup.dedup(Mdl.rank(all, p.size), p, maxKeep = k)
          } else Vector.empty
        if (plans.nonEmpty) solutions += SourceSolution(p, plans)
        else if (node.isLeaf) noise += p
        else queue.enqueueAll(node.children)
      }
    }
    Result(solutions.result(), noise.result())
  }

  /** Convenience end-to-end driver-side pipeline: cluster strings, discover
    * constants, build the hierarchy, and synthesize against `targets`.
    */
  def fromStrings(strings: Seq[String], targets: Seq[Pattern], k: Int = 10,
                  constantDiscovery: Boolean = true): Result = {
    val root = hierarchyOf(strings, constantDiscovery)
    synthesize(root, targets, k)
  }

  /** Cluster + constant-discover + build hierarchy for a string column. */
  def hierarchyOf(strings: Seq[String], constantDiscovery: Boolean = true): PNode = {
    val clusters = strings.groupBy(Tokenizer.tokenize)
    val leaves = clusters.toSeq.map { case (p, ss) =>
      val pat = if (constantDiscovery) ConstantDiscovery.discoverLocal(p, ss) else p
      (pat, ss.size.toLong)
    }
    // constant discovery may map two raw patterns to the same refined one
    val mergedLeaves = leaves.groupBy(_._1).view.mapValues(_.map(_._2).sum).toSeq
    Hierarchy.root(Hierarchy.build(mergedLeaves))
  }

  /** Leaf pattern of each distinct string form, with counts — the cluster
    * listing shown to the user for labeling (Fig. 3).
    */
  def leafClusters(strings: Seq[String], constantDiscovery: Boolean = true): Map[Pattern, Long] = {
    val clusters = strings.groupBy(Tokenizer.tokenize)
    clusters.toSeq.map { case (p, ss) =>
      val pat = if (constantDiscovery) ConstantDiscovery.discoverLocal(p, ss) else p
      (pat, ss.size.toLong)
    }.groupBy(_._1).view.mapValues(_.map(_._2).sum).toMap
  }
}
