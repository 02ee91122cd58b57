package repro.core.opt

import scala.collection.mutable
import repro.core.cost._
import repro.core.memo._
import repro.core.rules.{Exploration, IqpProblem}

/** A fully-specified physical step: an operator with its DP-assigned
  * execution time (§6.1's temporal assignment).
  */
sealed trait PlanNode { def groupId: Int; def time: Int }
final case class Compute(groupId: Int, time: Int, op: MOp,
                         children: Vector[PlanNode]) extends PlanNode
/** Reference to a state computed and saved at `fromTime`, loaded at `time`. */
final case class LoadState(groupId: Int, time: Int, fromTime: Int) extends PlanNode

/** A state materialized at `time` (either a cross-time transfer the DP chose,
  * or an MQO-selected shared sub-plan).
  */
final case class StateEntry(groupId: Int, time: Int, plan: PlanNode)
final case class OutputEntry(time: Int, plan: PlanNode)

final case class IncrementalPlan(
    states: Vector[StateEntry],
    outputs: Vector[OutputEntry],
    estCost: TCost,
    estStateRows: Double)

/** Eq.-6 dynamic program over (group, execution time) states, supporting a
  * set of shared/materialized sub-plans (for the MQO layer): a shared group
  * may be answered by a Load at any time ≥ its materialization time.
  */
final class Dp(memo: Memo, problem: IqpProblem) {
  private val k = problem.numTimes
  private val costFn = problem.costFn
  private val nG = memo.groups.size

  /** Earliest possible execution time per group (t-dom lower bound). */
  val avail: Array[Int] = {
    val a = Array.fill(nG)(Int.MaxValue)
    def opAvail(op: MOp): Int = op match {
      case MScanSnap(_, t)       => t
      case MScanDelta(_, _, t2)  => t2
      case _                     => 0
    }
    var changed = true
    while (changed) {
      changed = false
      var g = 0
      while (g < nG) {
        memo.groups(g).nodes.foreach { n =>
          val childA = n.children.map(a(_))
          if (childA.forall(_ != Int.MaxValue)) {
            val v = math.max(opAvail(n.op), (0 +: childA).max)
            if (v < a(g)) { a(g) = v; changed = true }
          }
        }
        g += 1
      }
    }
    a
  }

  /** Scalar resource cost of one node (time-independent). */
  private val nodeScalar = mutable.HashMap[MNode, Double]()
  private def resOf(n: MNode): Double = nodeScalar.getOrElseUpdate(n, {
    val cs = n.children.map(c => memo.groups(c).stats)
    val out = memo.nodeIndex.get(n).map(g => memo.groups(g).stats)
      .getOrElse(repro.core.stats.RelStats.empty)
    OpCost.of(n.op, cs, out).scalar
  })

  def saveScalar(g: Int): Double = OpCost.save(memo.groups(g).stats.rows).scalar
  def loadScalar(g: Int): Double = OpCost.load(memo.groups(g).stats.rows).scalar

  final case class Solved(best: Array[Array[TCost]],
                          choice: Array[Array[(MNode, Vector[Int])]]) {
    def cost(g: Int, t: Int): TCost = best(g)(t)
  }

  /** Value-iteration solve of the temporal DP under a shared set
    * (group -> materialization time).
    */
  def solve(shared: Map[Int, Int]): Solved = {
    val best = Array.fill(nG, k)(TCost.inf(k))
    val choice = Array.fill[(MNode, Vector[Int])](nG, k)(null)
    var changed = true
    var iters = 0
    while (changed && iters < 200) {
      changed = false; iters += 1
      var g = 0
      while (g < nG) {
        var t = if (avail(g) == Int.MaxValue) k else avail(g)
        while (t < k) {
          // option 1: load a materialized copy
          shared.get(g).filter(_ <= t).foreach { ts =>
            val c = TCost.at(k, t, loadScalar(g))
            if (costFn.lt(c, best(g)(t))) {
              best(g)(t) = c; choice(g)(t) = (null, Vector(ts)); changed = true
            }
          }
          // option 2: compute via some node
          memo.groups(g).nodes.foreach { n =>
            if (n.children.forall(c => avail(c) != Int.MaxValue && avail(c) <= t)) {
              var sum = TCost.at(k, t, resOf(n))
              val childTimes = n.children.map { c =>
                var bestC: TCost = null; var bestT = -1
                var tc = avail(c)
                while (tc <= t) {
                  val cand =
                    if (tc == t) best(c)(tc)
                    else best(c)(tc) + TCost.at(k, tc, saveScalar(c)) + TCost.at(k, t, loadScalar(c))
                  if (bestC == null || costFn.lt(cand, bestC)) { bestC = cand; bestT = tc }
                  tc += 1
                }
                sum = sum + bestC
                bestT
              }
              if (costFn.lt(sum, best(g)(t))) {
                best(g)(t) = sum; choice(g)(t) = (n, childTimes); changed = true
              }
            }
          }
          t += 1
        }
        g += 1
      }
    }
    Solved(best, choice)
  }

  /** Extract a plan tree for (g, t); cross-time child edges become
    * [[LoadState]] references and are appended to `states` (dedup by
    * (group, time)). Groups in `shared` resolve to loads.
    */
  def extract(solved: Solved, g: Int, t: Int,
              states: mutable.LinkedHashMap[(Int, Int), PlanNode],
              sharedResolvers: Map[Int, Int]): PlanNode = {
    val ch = solved.choice(g)(t)
    require(ch != null, s"no plan for group $g at time $t (avail=${avail(g)})")
    ch match {
      case (null, Vector(ts)) =>
        LoadState(g, t, ts) // materialized elsewhere (MQO state or output)
      case (node, childTimes) =>
        val kids = node.children.zip(childTimes).map { case (c, tc) =>
          if (tc == t) extract(solved, c, tc, states, sharedResolvers)
          else {
            if (!states.contains((c, tc)))
              states((c, tc)) = extract(solved, c, tc, states, sharedResolvers)
            LoadState(c, t, tc)
          }
        }
        Compute(g, t, node.op, kids.toVector)
    }
  }
}
