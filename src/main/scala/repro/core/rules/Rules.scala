package repro.core.rules

import scala.collection.mutable
import repro.core.algebra._
import repro.core.memo._
import repro.core.stats._

/** Which incremental methods' rules are enabled (§8.1 method simulation).
  *
  * The linear TVR-generating rules (filter/project/union/inner join) and the
  * intra-TVR merges are the shared foundation and are always on. What
  * defines each method is how it handles outer joins and aggregates:
  * `im1OuterDelta` is IM-1's direct outer/semi/anti-join delta rule
  * (Griffin–Kumar); `im1AggDelta` is the direct aggregate-state delta; the
  * other flags enable the corresponding inter-TVR rule families. Simulating
  * IM-2/OJV replaces the direct outer-join rule with their decompositions;
  * simulating HOV replaces the direct aggregate delta (where a view chain
  * applies) with factorized view maintenance.
  */
final case class Methods(im2: Boolean = true, ojv: Boolean = true, hov: Boolean = true,
                         im1OuterDelta: Boolean = true, im1AggDelta: Boolean = true)

object Methods {
  /** Classic incremental view maintenance. */
  val im1: Methods = Methods(im2 = false, ojv = false, hov = false)
  /** Stream-style positive/held-back decomposition for outer joins. */
  val im2: Methods = Methods(im2 = true, ojv = false, hov = false, im1OuterDelta = false)
  /** Larson–Zhou outer-join view maintenance. */
  val ojv: Methods = Methods(im2 = false, ojv = true, hov = false, im1OuterDelta = false)
  /** Higher-order view maintenance for aggregates over join chains. */
  val hov: Methods = Methods(im2 = false, ojv = false, hov = true, im1AggDelta = false)
  /** Tempura: every rule family enabled. */
  val full: Methods = Methods()
}

/** Exploration speed-up switches (§5.4): translational symmetry (skip
  * re-matching a rule on a (TVR, time) slot whose output already exists),
  * pruning non-promising alternatives (defer + skip snapshot-difference
  * rules when a TVR-generating delta exists), guided exploration (left-deep
  * merge order only: adjacent-delta merges, no delta-delta merging).
  */
final case class OptFlags(ts: Boolean = true, pna: Boolean = true, ge: Boolean = true)

/** An IQP problem instance (§2.1): `numTimes` discretized time points,
  * per-table delta statistics, the query, the times at which the full result
  * must be delivered, and the temporal cost function.
  */
final case class IqpProblem(
    numTimes: Int,
    query: RelOp,
    outputTimes: Seq[Int],
    tableStats: Map[String, TvrStats],
    costFn: repro.core.cost.CostFn)

final case class Exploration(
    memo: Memo,
    rootTvr: Int,
    exploreNanos: Long,
    im2RulesFired: Int,
    ojvRulesFired: Int,
    hovRulesFired: Int)

/** The Tempura rule engine: fires TVR rewrite rules on memo change events
  * until fixpoint, building the incremental plan space of §4/§5.
  */
final class RuleEngine(problem: IqpProblem, methods: Methods, flags: OptFlags) {
  val memo = new Memo
  private val k = problem.numTimes
  private val scanDefs: Map[String, Scan] =
    problem.query.scans.map(s => s.table -> s).toMap
  private val baseTvrByTable = mutable.HashMap[String, Int]()
  private val derived = mutable.HashMap[(String, Vector[Int]), Int]()
  private val fired = mutable.HashSet[(String, Int, Int, Int)]()
  private var im2Fired = 0; private var ojvFired = 0; private var hovFired = 0

  // ---------------------------------------------------------------- helpers

  private def tvr(id: Int): Tvr = memo.tvrs(id)

  /** Skip-marker for translational symmetry; only set on success. */
  private def done(rule: String, t: Int, a: Int, b: Int = -1): Boolean =
    flags.ts && fired.contains((rule, t, a, b))
  private def markDone(rule: String, t: Int, a: Int, b: Int = -1): Unit =
    if (flags.ts) fired.add((rule, t, a, b))

  private def stateSchemaCols(keys: Seq[String], aggs: Seq[AggCall],
                              childCols: Seq[(String, ColType)]): Seq[(String, ColType)] = {
    val km = childCols.toMap
    keys.map(c => c -> km(c)) ++
      aggs.flatMap(a => repro.core.tvr.DeltaOps.stateCols(a).map { sc =>
        sc -> (if (sc.endsWith("__sum")) TDouble else TLong: ColType)
      }) :+ ("__gcnt" -> TLong)
  }

  private def aggOutCols(keys: Seq[String], aggs: Seq[AggCall],
                         childCols: Seq[(String, ColType)]): Seq[(String, ColType)] = {
    val km = childCols.toMap
    keys.map(c => c -> km(c)) ++ aggs.map { a =>
      a.name -> (a.fn match {
        case CountF | CountStarF => TLong
        case _                   => TDouble
      })
    }
  }

  /** Estimate output stats of a memo operator given its children's groups. */
  private def estimate(op: MOp, children: Vector[Int]): RelStats = {
    def cs(i: Int): RelStats = memo.groups(children(i)).stats
    op match {
      case MScanSnap(tb, t)       => problem.tableStats(tb).snapStats(t)
      case MScanDelta(tb, t1, t2) => problem.tableStats(tb).deltaStats(t1, t2)
      case MFilter(p)             => Estimator.filter(cs(0), p)
      case MProject(es)           => Estimator.project(cs(0), es)
      case MUnionAll(_)           => Estimator.unionAll(children.indices.map(cs))
      case MJoin(kind, lk, rk, _) => Estimator.join(cs(0), cs(1), kind, lk, rk)
      case MDeltaJoin(kind, lk, rk, _) =>
        val rNew = RelStats(cs(2).rows + cs(3).rows,
          (cs(2).distinct.keySet ++ cs(3).distinct.keySet)
            .map(c => c -> math.max(cs(2).d(c), cs(3).d(c))).toMap)
        val a = Estimator.join(cs(1), rNew, kind, lk, rk)
        val b = Estimator.join(cs(0), cs(3),
          if (kind == Inner || kind == LeftOuter) Inner else LeftSemi, lk, rk)
        RelStats(a.rows + b.rows + (if (kind == Inner) 0.0 else 0.1 * cs(3).rows),
          (a.distinct.keySet ++ b.distinct.keySet)
            .map(c => c -> math.max(a.d(c), b.d(c))).toMap)
      case MMergeMult()  => RelStats(cs(0).rows + 0.5 * cs(1).rows,
        (cs(0).distinct.keySet ++ cs(1).distinct.keySet)
          .map(c => c -> math.max(cs(0).d(c), cs(1).d(c))).toMap)
      case MMergeDelta() => Estimator.unionAll(Seq(cs(0), cs(1)))
      case MDiffMult()   => RelStats(math.max(cs(0).rows * 0.1, cs(0).rows - cs(1).rows), cs(0).distinct)
      case MPartialAgg(keys, _) => Estimator.agg(cs(0), keys)
      case MMergeState(_, _) =>
        RelStats(math.max(cs(0).rows, cs(1).rows) + 0.1 * math.min(cs(0).rows, cs(1).rows),
          cs(0).distinct)
      case MFinalAgg(_, _) => cs(0)
      case MPadProject(cols) => RelStats(cs(0).rows, cs(0).distinct ++ cols.map(_._1 -> 1.0))
      case MOjvDelta(lk, rk, _) =>
        val rNew = RelStats(cs(2).rows + cs(3).rows, cs(2).distinct)
        val a = Estimator.join(cs(1), rNew, LeftOuter, lk, rk)
        val b = Estimator.join(cs(0), cs(3), Inner, lk, rk)
        RelStats(a.rows + b.rows + 0.1 * cs(3).rows,
          (a.distinct.keySet ++ b.distinct.keySet)
            .map(c => c -> math.max(a.d(c), b.d(c))).toMap)
      case MHovInit(spec) =>
        // rows here represent the materialized view-bundle size
        var total = 0.0
        for (i <- 1 until spec.nLeaves) {
          var acc = cs(0)
          for (j <- 1 until spec.nLeaves if j != i) {
            acc = Estimator.join(acc, cs(j), Inner, spec.chain(j - 1)._1, spec.chain(j - 1)._2)
          }
          total += acc.rows
        }
        RelStats(total + children.indices.map(cs(_).rows).sum, Map.empty)
      case MHovStep(_, _) =>
        RelStats(cs(0).rows + children.drop(1).indices.map(i => cs(i + 1).rows).sum, Map.empty)
      case MHovExtract(spec) =>
        val dRows = math.max(1.0, cs(0).rows * 0.02)
        RelStats(math.min(dRows, if (spec.keys.isEmpty) 1.0 else dRows), Map.empty)
    }
  }

  /** Output schema of a memo operator. */
  private def schemaOf(op: MOp, children: Vector[Int]): Seq[(String, ColType)] = {
    def cg(i: Int) = memo.groups(children(i)).schemaCols
    op match {
      case MScanSnap(tb, _)      => scanDefs(tb).cols
      case MScanDelta(tb, _, _)  => scanDefs(tb).cols
      case MFilter(_)            => cg(0)
      case MProject(es) =>
        val km = cg(0).toMap
        es.map {
          case (n, Col(c))     => n -> km(c)
          case (n, NullLit(t)) => n -> t
          case (n, Lit(_: String)) => n -> TString
          case (n, _)          => n -> TDouble
        }
      case MUnionAll(_)          => cg(0)
      case MJoin(kind, _, _, _) => kind match {
        case LeftSemi | LeftAnti => cg(0)
        case _                   => cg(0) ++ cg(1)
      }
      case MDeltaJoin(kind, _, _, rCols) => kind match {
        case LeftSemi | LeftAnti => cg(0)
        case _                   => cg(0) ++ rCols
      }
      case MMergeMult() | MMergeDelta() | MDiffMult() => cg(0)
      case MPartialAgg(keys, aggs) => stateSchemaCols(keys, aggs, cg(0))
      case MMergeState(_, _)       => cg(0)
      case MFinalAgg(keys, aggs)   => aggOutCols(keys, aggs, cg(0))
      case MPadProject(cols)       => cg(0) ++ cols
      case MOjvDelta(_, _, rCols)  => cg(0) ++ rCols
      case MHovInit(_) | MHovStep(_, _) => Seq("__aux" -> TLong)
      case MHovExtract(spec) =>
        stateSchemaCols(spec.keys, spec.aggs,
          spec.leafSchemas.flatten)
    }
  }

  /** Canonical statistics of a TVR's snapshot/delta, derived from its
    * logical expression — NOT from whichever rule happens to create the
    * group first. This keeps group stats (and therefore DP costs) identical
    * across method configurations, so enabling more rules can only improve
    * the optimum.
    */
  private val linkStatsCache = mutable.HashMap[(Int, TvrLink), Option[RelStats]]()
  private def linkStats(id: Int, link: TvrLink): Option[RelStats] =
    linkStatsCache.getOrElseUpdate((id, link), {
      val t = tvr(id)
      def snap(c: Int, ti: Int) = linkStats(c, Snap(ti))
      def del(c: Int, t1: Int, t2: Int) = linkStats(c, Del(t1, t2))
      (t.logical, link) match {
        case (Some(s: Scan), Snap(ti, MultP)) =>
          Some(problem.tableStats(s.table).snapStats(ti))
        case (Some(s: Scan), Del(t1, t2, MultP)) =>
          Some(problem.tableStats(s.table).deltaStats(t1, t2))
        case (Some(l), Snap(ti, MultP)) => l match {
          case FilterOp(_, p)   => snap(t.childTvrs(0), ti).map(Estimator.filter(_, p))
          case ProjectOp(_, es) => snap(t.childTvrs(0), ti).map(Estimator.project(_, es))
          case JoinOp(_, _, kd, lk, rk) =>
            for (a <- snap(t.childTvrs(0), ti); b <- snap(t.childTvrs(1), ti))
              yield Estimator.join(a, b, kd, lk, rk)
          case AggOp(_, keys, _) => snap(t.childTvrs(0), ti).map(Estimator.agg(_, keys))
          case UnionAllOp(_) =>
            val cs = t.childTvrs.map(snap(_, ti))
            if (cs.forall(_.isDefined)) Some(Estimator.unionAll(cs.map(_.get))) else None
          case _ => None
        }
        case (Some(AggOp(_, keys, _)), Snap(ti, StateP)) =>
          snap(t.childTvrs(0), ti).map(Estimator.agg(_, keys))
        case (Some(AggOp(_, keys, _)), Del(t1, t2, StateP)) =>
          del(t.childTvrs(0), t1, t2).map(Estimator.agg(_, keys))
        case (Some(l), Del(t1, t2, MultP)) => l match {
          case FilterOp(_, p)   => del(t.childTvrs(0), t1, t2).map(Estimator.filter(_, p))
          case ProjectOp(_, es) => del(t.childTvrs(0), t1, t2).map(Estimator.project(_, es))
          case JoinOp(_, _, kd, lk, rk) =>
            for {
              lOld <- snap(t.childTvrs(0), t1); dL <- del(t.childTvrs(0), t1, t2)
              rNew <- snap(t.childTvrs(1), t2); dR <- del(t.childTvrs(1), t1, t2)
            } yield {
              val a = Estimator.join(dL, rNew, kd, lk, rk)
              val b = Estimator.join(lOld, dR,
                if (kd == Inner || kd == LeftOuter) Inner else LeftSemi, lk, rk)
              RelStats(a.rows + b.rows + (if (kd == Inner) 0.0 else 0.1 * dR.rows),
                (a.distinct.keySet ++ b.distinct.keySet)
                  .map(c => c -> math.max(a.d(c), b.d(c))).toMap)
            }
          case UnionAllOp(_) =>
            val cs = t.childTvrs.map(del(_, t1, t2))
            if (cs.forall(_.isDefined)) Some(Estimator.unionAll(cs.map(_.get))) else None
          case _ => None
        }
        case _ => None
      }
    })

  /** Register an operator as a given intra-TVR link (creating the group if
    * the TVR does not have that link yet). Returns true if new.
    */
  private def registerAs(tvrId: Int, link: TvrLink, op: MOp, children: Vector[Int]): Boolean = {
    memo.nRuleFires += 1
    val node = MNode(op, children)
    val existing = memo.linkGroup(tvrId, link)
    val st = linkStats(tvrId, link).getOrElse(estimate(op, children))
    val g = memo.register(node, existing, schemaOf(op, children), st)
    memo.addLink(tvrId, link, g) || existing.isEmpty
  }

  /** A group with no TVR link (helper subtrees like padded Q^N). */
  private def anonGroup(op: MOp, children: Vector[Int]): Int =
    memo.register(MNode(op, children), None, schemaOf(op, children), estimate(op, children))

  // --------------------------------------------------------------- seeding

  /** Build TVR skeletons for the whole query and seed scan links. */
  private def seedTvr(op: RelOp): Int = op match {
    case SubqueryOp(_, c) => seedTvr(c) // transparent boundary
    case s: Scan =>
      baseTvrByTable.getOrElseUpdate(s.table, {
        val t = memo.newTvr()
        t.baseTable = Some(s.table); t.logical = Some(s)
        t.appendOnly = !problem.tableStats(s.table).hasRetractions
        for (i <- 0 until k) {
          registerAs(t.id, Snap(i), MScanSnap(s.table, i), Vector.empty)
          if (i > 0) registerAs(t.id, Del(i - 1, i), MScanDelta(s.table, i - 1, i), Vector.empty)
        }
        t.id
      })
    case o =>
      val children = o.children.map(seedTvr).toVector
      val key = (o.getClass.getSimpleName + sig(o), children)
      derived.getOrElseUpdate(key, {
        val t = memo.newTvr()
        t.logical = Some(o); t.childTvrs = children
        t.appendOnly = o match {
          case _: FilterOp | _: ProjectOp | _: UnionAllOp => children.forall(tvr(_).appendOnly)
          case JoinOp(_, _, Inner, _, _) | JoinOp(_, _, LeftSemi, _, _) =>
            children.forall(tvr(_).appendOnly)
          case _ => false
        }
        children.foreach(c => memo.recordParent(c, t.id))
        t.id
      })
  }

  /** Structural signature of an operator (ignoring its children objects). */
  private def sig(o: RelOp): String = o match {
    case FilterOp(_, p)        => s"F(${p.toSql})"
    case ProjectOp(_, es)      => s"P(${es.map { case (n, e) => s"$n=${e.toSql}" }.mkString(",")})"
    case JoinOp(_, _, kd, lk, rk) => s"J($kd,$lk,$rk)"
    case AggOp(_, ks, as)      => s"A($ks,${as.map(_.toSql).mkString(",")})"
    case UnionAllOp(cs)        => s"U(${cs.size})"
    case s: Scan               => s"S(${s.table})"
    case SubqueryOp(n, _)      => s"Q($n)"
  }

  /** Create-or-reuse a derived TVR for an inter-TVR rule result. */
  private def derivedTvr(disc: String, logical: RelOp, children: Vector[Int],
                         appendOnly: Boolean): (Int, Boolean) = {
    val key = (disc + sig(logical), children)
    derived.get(key) match {
      case Some(id) => (id, false)
      case None =>
        val t = memo.newTvr()
        t.logical = Some(logical); t.childTvrs = children; t.appendOnly = appendOnly
        children.foreach(c => memo.recordParent(c, t.id))
        derived(key) = t.id
        (t.id, true)
    }
  }

  // ----------------------------------------------------------------- rules

  /** Def. 3: [Q(R)]_t = Q(R_t) — register snapshots of this TVR at every
    * time where all children's snapshots exist.
    */
  private def ruleSnapshotPropagate(id: Int): Unit = {
    val t = tvr(id)
    val logical = t.logical.getOrElse(return)
    if (t.baseTable.isDefined) return
    for (ti <- 0 until k if !done("snap", ti, id)) {
      memo.nRuleAttempts += 1
      val childSnaps = t.childTvrs.map(c => memo.linkGroup(c, Snap(ti)))
      if (childSnaps.forall(_.isDefined)) {
        val cs = childSnaps.map(_.get)
        logical match {
          case FilterOp(_, p)   => registerAs(id, Snap(ti), MFilter(p), cs)
          case ProjectOp(_, es) => registerAs(id, Snap(ti), MProject(es), cs)
          case UnionAllOp(_)    => registerAs(id, Snap(ti), MUnionAll(cs.size), cs)
          case JoinOp(_, r, kd, lk, rk) =>
            registerAs(id, Snap(ti), MJoin(kd, lk, rk, rightColsOf(id)), cs)
          case AggOp(_, keys, aggs) =>
            registerAs(id, Snap(ti, StateP), MPartialAgg(keys, aggs), cs)
          case _: Scan => ()
        }
        markDone("snap", ti, id)
      }
    }
  }

  private def rightColsOf(id: Int): Seq[(String, ColType)] = {
    val t = tvr(id)
    t.logical match {
      case Some(JoinOp(_, r, _, _, _)) => r.schema.zip(r.types)
      case _ => Nil
    }
  }

  /** Final: aggregate state snapshot → multiplicity snapshot. */
  private def ruleFinal(id: Int): Unit = {
    val t = tvr(id)
    t.logical match {
      case Some(AggOp(_, keys, aggs)) =>
        for (ti <- 0 until k if !done("final", ti, id)) {
          memo.nRuleAttempts += 1
          memo.linkGroup(id, Snap(ti, StateP)).foreach { g =>
            registerAs(id, Snap(ti), MFinalAgg(keys, aggs), Vector(g))
            markDone("final", ti, id)
          }
        }
      case _ => ()
    }
  }

  /** All spans for which delta links may exist (adjacent only under GE). */
  private def spans: Seq[(Int, Int)] =
    if (flags.ge) (0 until k - 1).map(t => (t, t + 1))
    else for { a <- 0 until k - 1; b <- a + 1 until k } yield (a, b)

  /** TVR-generating rules (§4.1): per-operator delta queries. */
  private def ruleDelta(id: Int): Unit = {
    val t = tvr(id)
    val logical = t.logical.getOrElse(return)
    if (t.baseTable.isDefined) return
    for ((t1, t2) <- spans if !done("delta", t1 * 100 + t2, id)) {
      memo.nRuleAttempts += 1
      def cDel(i: Int, p: Persp = MultP) = memo.linkGroup(t.childTvrs(i), Del(t1, t2, p))
      def cSnap(i: Int, ti: Int) = memo.linkGroup(t.childTvrs(i), Snap(ti))
      logical match {
        case FilterOp(_, p) =>
          cDel(0).foreach { g =>
            registerAs(id, Del(t1, t2), MFilter(p), Vector(g)); markDone("delta", t1 * 100 + t2, id)
          }
        case ProjectOp(_, es) =>
          cDel(0).foreach { g =>
            registerAs(id, Del(t1, t2), MProject(es), Vector(g)); markDone("delta", t1 * 100 + t2, id)
          }
        case UnionAllOp(cs) =>
          val ds = t.childTvrs.indices.map(i => cDel(i))
          if (ds.forall(_.isDefined)) {
            registerAs(id, Del(t1, t2), MUnionAll(ds.size), ds.map(_.get).toVector)
            markDone("delta", t1 * 100 + t2, id)
          }
        case AggOp(_, keys, aggs) if aggs.forall(_.incrementable) &&
            (methods.im1AggDelta || hovChain(id).isEmpty) =>
          cDel(0).foreach { g =>
            registerAs(id, Del(t1, t2, StateP), MPartialAgg(keys, aggs), Vector(g))
            markDone("delta", t1 * 100 + t2, id)
          }
        case JoinOp(_, _, kd, lk, rk) if kd == Inner || methods.im1OuterDelta =>
          // children [lOld, dL, rOld, dR]; the operator maintains the
          // resident right-side state internally (IncrHashJoin-style), so
          // the delta is charged exactly once
          val need = Seq(cSnap(0, t1), cDel(0), cSnap(1, t1), cDel(1))
          if (need.forall(_.isDefined)) {
            registerAs(id, Del(t1, t2), MDeltaJoin(kd, lk, rk, rightColsOf(id)),
              need.map(_.get).toVector)
            markDone("delta", t1 * 100 + t2, id)
          }
        case _ => ()
      }
    }
  }

  /** Intra-TVR merge rules: snapshot + delta → later snapshot, in both
    * perspectives; plus delta-delta merging when GE is off.
    */
  private def ruleMerge(id: Int): Unit = {
    val t = tvr(id)
    val keysAggs = t.logical.collect { case AggOp(_, ks, as) => (ks, as) }
    for ((t1, t2) <- spans) {
      // multiplicity perspective
      if (!done("mergeM", t1 * 100 + t2, id)) {
        memo.nRuleAttempts += 1
        (memo.linkGroup(id, Snap(t1)), memo.linkGroup(id, Del(t1, t2))) match {
          case (Some(s), Some(d)) =>
            registerAs(id, Snap(t2), MMergeMult(), Vector(s, d))
            markDone("mergeM", t1 * 100 + t2, id)
          case _ => ()
        }
      }
      // attribute (state) perspective
      keysAggs.foreach { case (ks, as) =>
        if (!done("mergeS", t1 * 100 + t2, id)) {
          memo.nRuleAttempts += 1
          (memo.linkGroup(id, Snap(t1, StateP)), memo.linkGroup(id, Del(t1, t2, StateP))) match {
            case (Some(s), Some(d)) =>
              registerAs(id, Snap(t2, StateP), MMergeState(ks, as), Vector(s, d))
              markDone("mergeS", t1 * 100 + t2, id)
            case _ => ()
          }
        }
      }
    }
    if (!flags.ge) {
      for { a <- 0 until k - 1; b <- a + 1 until k - 1; c <- b + 1 until k } {
        memo.nRuleAttempts += 1
        (memo.linkGroup(id, Del(a, b)), memo.linkGroup(id, Del(b, c))) match {
          case (Some(x), Some(y)) => registerAs(id, Del(a, c), MMergeDelta(), Vector(x, y))
          case _ => ()
        }
      }
    }
  }

  /** Intra-TVR difference rule (deferred; skipped under PNA when a
    * TVR-generating delta already exists). Returns true if it fired.
    */
  private def ruleDiff(id: Int): Boolean = {
    var firedAny = false
    for ((t1, t2) <- spans if !done("diff", t1 * 100 + t2, id)) {
      memo.nRuleAttempts += 1
      val skip = flags.pna && memo.linkGroup(id, Del(t1, t2)).isDefined
      if (!skip) {
        (memo.linkGroup(id, Snap(t2)), memo.linkGroup(id, Snap(t1))) match {
          case (Some(sNew), Some(sOld)) =>
            if (registerAs(id, Del(t1, t2), MDiffMult(), Vector(sNew, sOld))) firedAny = true
            markDone("diff", t1 * 100 + t2, id)
          case _ => ()
        }
      }
    }
    firedAny
  }

  /** IM-2 inter-TVR rules (§4.2 Eq. 3): positive / held-back decomposition. */
  private def ruleIm2(id: Int): Unit = {
    if (!methods.im2) return
    val t = tvr(id)
    val logical = t.logical.getOrElse(return)

    // positive part of this TVR itself
    if (!t.inter.contains(Im2Pos)) {
      memo.nRuleAttempts += 1
      if (t.appendOnly) {
        // append-only TVRs never retract: Q^P = Q
        memo.addInter(id, Im2Pos, id); im2Fired += 1
      } else logical match {
        case JoinOp(_, _, LeftOuter, lk, rk) =>
          val ps = t.childTvrs.map(c => tvr(c).inter.get(Im2Pos))
          if (ps.size == 2 && ps.forall(_.isDefined)) {
            val (lp, rp) = (ps(0).get, ps(1).get)
            val (lr, rr) = (tvr(lp).logical.get, tvr(rp).logical.get)
            val posT = derivedTvr("im2pos", JoinOp(lr, rr, Inner, lk, rk), Vector(lp, rp),
              appendOnly = true)
            val negT = derivedTvr("im2neg", JoinOp(lr, rr, LeftAnti, lk, rk), Vector(lp, rp),
              appendOnly = false)
            memo.addInter(id, Im2Pos, posT._1)
            memo.addInter(id, Im2Neg, negT._1)
            memo.recordParent(posT._1, id); memo.recordParent(negT._1, id)
            im2Fired += 1
          }
        case FilterOp(_, p) =>
          tvr(t.childTvrs(0)).inter.get(Im2Pos).foreach { cp =>
            if (cp == t.childTvrs(0)) memo.addInter(id, Im2Pos, id)
            else {
              val pt = derivedTvr("im2pos", FilterOp(tvr(cp).logical.get, p), Vector(cp),
                appendOnly = tvr(cp).appendOnly)
              memo.addInter(id, Im2Pos, pt._1); memo.recordParent(pt._1, id)
            }
            im2Fired += 1
          }
        case _ => ()
      }
    }

    // consumption for left-outer joins: Q_t = Q^P_t +# pad(Q^N_t)
    (t.inter.get(Im2Pos), t.inter.get(Im2Neg)) match {
      case (Some(pos), Some(neg)) if pos != id =>
        val rCols = rightColsOf(id)
        for (ti <- 0 until k if !done("im2use", ti, id)) {
          memo.nRuleAttempts += 1
          (memo.linkGroup(pos, Snap(ti)), memo.linkGroup(neg, Snap(ti))) match {
            case (Some(pg), Some(ng)) =>
              val padded = anonGroup(MPadProject(rCols), Vector(ng))
              registerAs(id, Snap(ti), MUnionAll(2), Vector(pg, padded))
              markDone("im2use", ti, id)
            case _ => ()
          }
        }
      case _ => ()
    }

    // aggregates over a decomposed TVR: state merges across the parts
    logical match {
      case AggOp(_, keys, aggs) if aggs.forall(_.incrementable) =>
        val x = t.childTvrs(0)
        (tvr(x).inter.get(Im2Pos), tvr(x).inter.get(Im2Neg)) match {
          case (Some(pos), Some(neg)) if pos != x =>
            val xl = tvr(x).logical.get
            val padCols: Seq[(String, Expr)] =
              tvr(neg).logical.get.schema.map(c => c -> (Col(c): Expr)) ++
                rightColsOf(x).map { case (c, ty) => c -> (NullLit(ty): Expr) }
            val padT = derivedTvr("im2padneg", ProjectOp(tvr(neg).logical.get, padCols),
              Vector(neg), appendOnly = false)
            val ap = derivedTvr("im2aggpos", AggOp(tvr(pos).logical.get, keys, aggs),
              Vector(pos), appendOnly = false)
            val an = derivedTvr("im2aggneg", AggOp(tvr(padT._1).logical.get, keys, aggs),
              Vector(padT._1), appendOnly = false)
            memo.addInter(id, Im2AggPos, ap._1); memo.addInter(id, Im2AggNeg, an._1)
            memo.recordParent(ap._1, id); memo.recordParent(an._1, id)
            im2Fired += 1
            for (ti <- 0 until k if !done("im2agg", ti, id)) {
              memo.nRuleAttempts += 1
              (memo.linkGroup(ap._1, Snap(ti, StateP)), memo.linkGroup(an._1, Snap(ti, StateP))) match {
                case (Some(pg), Some(ng)) =>
                  registerAs(id, Snap(ti, StateP), MMergeState(keys, aggs), Vector(pg, ng))
                  markDone("im2agg", ti, id)
                case _ => ()
              }
            }
          case _ => ()
        }
      case _ => ()
    }
  }

  /** OJV inter-TVR rules (§4.2 Eq. 4): per-update delta of an outer join
    * computing ΔQ^I against the previous snapshot of Q.
    */
  private def ruleOjv(id: Int): Unit = {
    if (!methods.ojv) return
    val t = tvr(id)
    t.logical match {
      case Some(JoinOp(_, _, LeftOuter, lk, rk)) =>
        for ((t1, t2) <- spans if !done("ojv", t1 * 100 + t2, id)) {
          memo.nRuleAttempts += 1
          val need = Seq(
            memo.linkGroup(t.childTvrs(0), Snap(t1)),
            memo.linkGroup(t.childTvrs(0), Del(t1, t2)),
            memo.linkGroup(t.childTvrs(1), Snap(t1)),
            memo.linkGroup(t.childTvrs(1), Del(t1, t2)),
            memo.linkGroup(id, Snap(t1)))
          if (need.forall(_.isDefined)) {
            registerAs(id, Del(t1, t2), MOjvDelta(lk, rk, rightColsOf(id)),
              need.map(_.get).toVector)
            ojvFired += 1
            markDone("ojv", t1 * 100 + t2, id)
          }
        }
      case _ => ()
    }
  }

  /** HOV inter-TVR rules (§4.2 Eq. 5): factorized per-input deltas of an
    * aggregate over an inner-join chain, with materialized complement views.
    */
  /** The HOV-eligible join chain below an aggregate TVR, if any: at least
    * two leaves, star-shaped (every chain step's left keys live in leaf 0).
    */
  private def hovChain(id: Int): Option[(Vector[Int], Vector[(Seq[String], Seq[String])])] =
    tvr(id).logical match {
      case Some(AggOp(_, _, aggs)) if aggs.forall(_.incrementable) =>
        extractChain(tvr(id).childTvrs(0)).filter { case (leaves, joins) =>
          val rootCols = groupColsOfTvr(leaves(0)).map(_._1).toSet
          leaves.size >= 2 && joins.forall(_._1.forall(rootCols.contains))
        }
      case _ => None
    }

  private def ruleHov(id: Int): Unit = {
    if (!methods.hov) return
    val t = tvr(id)
    t.logical match {
      case Some(AggOp(_, keys, aggs)) if aggs.forall(_.incrementable) =>
        val (leaves, joins) = hovChain(id).getOrElse(return)
        val spec = HovSpec(keys, aggs, leaves.map(l => groupColsOfTvr(l)).toVector, joins)
        // the aux TVR holds the view bundle; it has no relational logical
        // expression of its own (rules must not pattern-match it)
        val hovT = derived.getOrElseUpdate((s"hovaux$id", leaves), {
          val aux = memo.newTvr()
          aux.childTvrs = leaves; aux.appendOnly = false
          leaves.foreach(l => memo.recordParent(l, aux.id))
          aux.id
        })
        memo.addInter(id, HovAux, hovT)
        memo.recordParent(hovT, id)
        leaves.foreach(l => memo.recordParent(l, hovT))
        for (ti <- 0 until k if !done("hovInit", ti, id)) {
          memo.nRuleAttempts += 1
          val snaps = leaves.map(l => memo.linkGroup(l, Snap(ti)))
          if (snaps.forall(_.isDefined)) {
            registerAs(hovT, Snap(ti, AuxP), MHovInit(spec), snaps.map(_.get).toVector)
            hovFired += 1
            markDone("hovInit", ti, id)
          }
        }
        for ((t1, t2) <- spans if !done("hovStep", t1 * 100 + t2, id)) {
          memo.nRuleAttempts += 1
          val prev = memo.linkGroup(hovT, Snap(t1, AuxP))
          val dels = leaves.map(l => memo.linkGroup(l, Del(t1, t2)))
          if (prev.isDefined && dels.forall(_.isDefined)) {
            val children = (prev.get +: dels.map(_.get)).toVector
            registerAs(hovT, Snap(t2, AuxP), MHovStep(spec), children)
            registerAs(hovT, Del(t1, t2, AuxP), MHovStep(spec, forExtract = true), children)
            memo.linkGroup(hovT, Del(t1, t2, AuxP)).foreach { stepped =>
              registerAs(id, Del(t1, t2, StateP), MHovExtract(spec), Vector(stepped))
            }
            hovFired += 1
            markDone("hovStep", t1 * 100 + t2, id)
          }
        }
      case _ => ()
    }
  }

  private def groupColsOfTvr(id: Int): Seq[(String, ColType)] = {
    val lg = tvr(id).logical.get
    lg.schema.zip(lg.types)
  }

  /** Flatten a left-deep inner-join chain below an aggregate into its leaf
    * TVRs and chain keys; any non-inner-join TVR is treated as a leaf
    * (virtual input — this is what lets HOV compose with IM-2/OJV parts).
    */
  private def extractChain(id: Int): Option[(Vector[Int], Vector[(Seq[String], Seq[String])])] =
    tvr(id).logical match {
      case Some(JoinOp(_, _, Inner, lk, rk)) =>
        extractChain(tvr(id).childTvrs(0)).map { case (ls, js) =>
          (ls :+ tvr(id).childTvrs(1), js :+ (lk, rk))
        }
      case _ => Some((Vector(id), Vector.empty))
    }

  // ------------------------------------------------------------- main loop

  private def attemptAll(id: Int): Unit = {
    ruleSnapshotPropagate(id)
    ruleDelta(id)
    ruleMerge(id)
    ruleFinal(id)
    ruleIm2(id)
    ruleOjv(id)
    ruleHov(id)
  }

  def explore(): Exploration = {
    val start = System.nanoTime()
    val root = seedTvr(problem.query)
    var keepGoing = true
    while (keepGoing) {
      while (memo.events.nonEmpty) {
        val ev = memo.events.dequeue()
        val affected = ev match {
          case LinkAdded(t, _, _)  => memo.ancestorsOf(t)
          case InterAdded(t, _, _) => memo.ancestorsOf(t)
          case NodeAdded(_, _)     => Nil
        }
        affected.foreach(attemptAll)
      }
      // deferred difference rules (PNA gives them the lowest priority)
      keepGoing = memo.tvrs.indices.map(ruleDiff).exists(identity)
      if (keepGoing) {
        // re-attempt everything that may consume the new diffs
        memo.tvrs.indices.foreach(attemptAll)
      }
    }
    Exploration(memo, root, System.nanoTime() - start, im2Fired, ojvFired, hovFired)
  }
}
