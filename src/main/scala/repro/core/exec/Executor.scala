package repro.core.exec

import scala.collection.mutable
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.algebra._
import repro.core.cost.OpCost
import repro.core.memo._
import repro.core.opt._
import repro.core.tvr.{Delta, DeltaOps}

/** Runtime value: a delta-encoded relation, or a HOV view bundle. */
sealed trait RtVal
final case class Rel(df: DataFrame, rows: Long) extends RtVal
final case class HovRt(leafCur: Vector[DataFrame],
                       views: Vector[Option[DataFrame]],
                       contribution: DataFrame,
                       stateRows: Double) extends RtVal

/** Execution metrics of an incremental plan run (§8.2's "real" costs):
  * a rows-processed CPU proxy per time step (delta-sized inputs streamed
  * plus outputs, with resident state charged at the probe rate — mirroring
  * the cost model so measured and estimated costs are comparable), wall
  * time per step, and materialized-state sizes (Fig. 7(e)(f)).
  */
final case class ExecReport(
    perTimeRows: Vector[Double],
    perTimeWallMs: Vector[Double],
    stateRows: Double,
    states: Vector[((Int, Int), Double)],
    outputs: Vector[(Int, DataFrame)]) {
  def totalRows: Double = perTimeRows.sum
  def weighted(weights: Vector[Double]): Double =
    perTimeRows.zip(weights).map { case (c, w) => c * w }.sum
}

/** Interprets an [[IncrementalPlan]] over real per-time input deltas. */
final class Executor(spark: SparkSession, plan: IncrementalPlan,
                     inputs: Map[String, Vector[DataFrame]], numTimes: Int) {
  private val cache = mutable.HashMap[(Int, Int), RtVal]()
  private val rowsByTime = Array.fill(numTimes)(0.0)
  private val measuredKeys = mutable.HashSet[(Int, Int)]()
  private val stateSizes = mutable.LinkedHashMap[(Int, Int), Double]()
  private val P = OpCost.ProbeRate

  private def mat(df: DataFrame): Rel = {
    val d = df.persist()
    Rel(d, d.count())
  }

  private def relOf(v: RtVal): DataFrame = v match {
    case Rel(df, _) => df
    case h: HovRt   => h.contribution
  }
  private def rowsOf(v: RtVal): Double = v match {
    case Rel(_, r) => r.toDouble
    case h: HovRt  => h.stateRows
  }

  private def scanDelta(table: String, t1: Int, t2: Int): DataFrame =
    Delta.unionAll((t1 + 1 to t2).map(inputs(table)(_)).map(Delta.attach))

  private def scanSnap(table: String, t: Int): DataFrame =
    Delta.collapse(Delta.unionAll((0 to t).map(inputs(table)(_)).map(Delta.attach)))

  private def eval(p: PlanNode): RtVal = cache.getOrElseUpdate((p.groupId, p.time), p match {
    case LoadState(g, t, from) =>
      val v = cache.getOrElse((g, from),
        throw new IllegalStateException(s"state ($g,$from) not materialized before t=$t"))
      // loading a state streams a fraction of its rows (OpCost.StateRate)
      addRows(t, (g, from), rowsOf(v) * OpCost.StateRate)
      v
    case Compute(g, t, op, children) =>
      val cs = children.map(eval)
      def df(i: Int) = relOf(cs(i))
      def n(i: Int) = rowsOf(cs(i))
      val (value, measured): (RtVal, Double) = op match {
        case MScanSnap(tb, ti) =>
          val r = mat(scanSnap(tb, ti)); (r, r.rows.toDouble)
        case MScanDelta(tb, t1, t2) =>
          val r = mat(scanDelta(tb, t1, t2)); (r, r.rows.toDouble)
        case MFilter(pred) =>
          val r = mat(DeltaOps.filter(df(0), pred)); (r, n(0))
        case MProject(es) =>
          val r = mat(DeltaOps.project(df(0), es)); (r, n(0))
        case MUnionAll(_) =>
          val r = mat(Delta.unionAll(children.indices.map(df))); (r, children.indices.map(n).sum)
        case MJoin(kind, lk, rk, rCols) =>
          val out = kind match {
            case Inner     => DeltaOps.joinInner(df(0), df(1), lk, rk)
            case LeftOuter => DeltaOps.joinLeftOuterSnap(df(0), df(1), lk, rk, rCols)
            case LeftSemi  => DeltaOps.semiSnap(df(0), df(1), lk, rk)
            case LeftAnti  => DeltaOps.antiSnap(df(0), df(1), lk, rk)
          }
          val r = mat(out); (r, n(0) + n(1) + r.rows)
        case MDeltaJoin(kind, lk, rk, rCols) =>
          // children [lOld, dL, rOld, dR]; the resident right-side state is
          // updated in place (charged at the probe rate)
          val rNew = Delta.merge(df(2), df(3))
          val out = kind match {
            case Inner     => DeltaOps.deltaInnerJoin(df(0), df(1), rNew, df(3), lk, rk)
            case LeftOuter => DeltaOps.deltaLeftOuter(df(0), df(1), df(2), df(3), rNew, lk, rk, rCols)
            case LeftSemi  => DeltaOps.deltaSemi(df(0), df(1), df(2), df(3), rNew, lk, rk)
            case LeftAnti  => DeltaOps.deltaAnti(df(0), df(1), df(2), df(3), rNew, lk, rk)
          }
          val r = mat(out)
          (r, n(1) + n(3) + r.rows + P * (n(0) + n(2)))
        case MMergeMult() =>
          val r = mat(Delta.merge(df(0), df(1))); (r, n(1) + P * n(0))
        case MMergeDelta() =>
          val r = mat(Delta.unionAll(Seq(df(0), df(1)))); (r, n(0) + n(1))
        case MDiffMult() =>
          val r = mat(Delta.merge(df(0), Delta.negate(df(1)))); (r, n(0) + n(1) + r.rows)
        case MPartialAgg(keys, aggs) =>
          val r = mat(DeltaOps.partialAgg(df(0), keys, aggs)); (r, n(0) + r.rows)
        case MMergeState(keys, aggs) =>
          val r = mat(DeltaOps.mergeStates(Seq(df(0), df(1)), keys, aggs)); (r, n(1) + P * n(0))
        case MFinalAgg(keys, aggs) =>
          val r = mat(DeltaOps.finalAgg(df(0), keys, aggs)); (r, n(0))
        case MPadProject(cols) =>
          val r = mat(DeltaOps.padNulls(df(0), cols)); (r, n(0))
        case MOjvDelta(lk, rk, rCols) =>
          // children [lOld, dL, rOld, dR, qOld]: per-table updates,
          // ΔQ^I derived from the previous snapshot of Q (Eq. 4b)
          import org.apache.spark.sql.functions.{col => fcol}
          val rNew = Delta.merge(df(2), df(3))
          val dQD = DeltaOps.joinInner(df(0), df(3), lk, rk)
          val trans = DeltaOps.transitions(df(2), df(3), rk)
          val qOld = df(4)
          val rKeyInQ = rCols.head._1
          // keys whose match count went 0 -> positive: retract the padded
          // rows, read off the previous snapshot of Q (Eq. 4b)
          val padded = Delta.attach(qOld).filter(qOld(rKeyInQ).isNull)
            .select((memoLeftCols(rCols, qOld) :+ fcol(Delta.MULT)): _*)
          val pd = padded.withColumnRenamed(Delta.MULT, "__lm")
          val gone = trans.filter(fcol("__is"))
          val corrRetract = DeltaOps.padNulls(
            pd.join(gone, lk.zip(rk).map { case (a, b) => pd(a) === gone(b) }.reduce(_ && _), "inner")
              .select(Delta.dataCols(padded).map(pd(_)) :+ (-pd("__lm")).as(Delta.MULT): _*),
            rCols)
          // keys whose match count went positive -> 0: restore padding for
          // every left row with that key (the previous snapshot has no
          // padded rows for them, so source from L)
          val ld = Delta.attach(df(0)).withColumnRenamed(Delta.MULT, "__lm")
          val back = trans.filter(!fcol("__is"))
          val corrRestore = DeltaOps.padNulls(
            ld.join(back, lk.zip(rk).map { case (a, b) => ld(a) === back(b) }.reduce(_ && _), "inner")
              .select(Delta.dataCols(df(0)).map(ld(_)) :+ ld("__lm").as(Delta.MULT): _*),
            rCols)
          val dQL = DeltaOps.joinLeftOuterSnap(df(1), rNew, lk, rk, rCols)
          val r = mat(Delta.unionAll(Seq(dQD, corrRetract, corrRestore, dQL)))
          (r, n(1) + n(3) + r.rows + 0.3 * n(4) + P * (n(0) + n(2)))
        case MHovInit(spec) =>
          val leaves = children.indices.map(i => Delta.collapse(df(i)).persist()).toVector
          val views = (0 until spec.nLeaves).map { i =>
            if (i == 0) None
            else Some(chainJoin(spec, leaves, skip = i).persist())
          }.toVector
          val vRows = views.flatten.map(_.count().toDouble).sum
          val lRows = leaves.map(_.count().toDouble).sum
          val h = HovRt(leaves, views, null, vRows + lRows)
          (h, vRows + lRows)
        case MHovStep(spec, _) =>
          val prev = cs(0).asInstanceOf[HovRt]
          val deltas = (1 until children.size).map(df).toVector
          val (h, work) = hovStep(spec, prev, deltas)
          (h, work)
        case MHovExtract(spec) =>
          val prev = cs(0).asInstanceOf[HovRt]
          val r = mat(prev.contribution)
          (r, r.rows.toDouble)
      }
      addRows(t, (g, t), measured)
      value
  })

  private def memoLeftCols(rCols: Seq[(String, ColType)], qOld: DataFrame) = {
    val rNames = rCols.map(_._1).toSet
    qOld.columns.filterNot(c => rNames.contains(c) || c == Delta.MULT).toSeq.map(qOld(_))
  }

  private def addRows(t: Int, key: (Int, Int), v: Double): Unit =
    if (measuredKeys.add((key._1, t))) rowsByTime(t) += v

  private def chainJoin(spec: HovSpec, frames: Vector[DataFrame], skip: Int,
                        replace: Map[Int, DataFrame] = Map.empty): DataFrame = {
    var acc = replace.getOrElse(0, frames(0))
    for (j <- 1 until spec.nLeaves if j != skip) {
      val f = replace.getOrElse(j, frames(j))
      acc = DeltaOps.joinInner(acc, f, spec.chain(j - 1)._1, spec.chain(j - 1)._2)
    }
    acc
  }

  /** One HOV trigger round: apply each leaf's delta in order, using the
    * complement views for the contribution joins and updating the other
    * views incrementally (DBToaster-style, §4.2 Eq. 5).
    */
  private def hovStep(spec: HovSpec, prev: HovRt, deltas: Vector[DataFrame]): (HovRt, Double) = {
    val n = spec.nLeaves
    val leafCols = spec.leafSchemas.flatten.map(_._1)
    var leaves = prev.leafCur
    var views = prev.views
    var work = 0.0
    val contribs = mutable.ArrayBuffer[DataFrame]()
    for (i <- 0 until n) {
      val di = deltas(i)
      val dRows = di.count().toDouble
      work += dRows
      if (dRows > 0) {
        val contrib =
          if (i == 0) chainJoin(spec, leaves, skip = -1, replace = Map(0 -> di))
          else DeltaOps.joinInner(views(i).get, di, spec.chain(i - 1)._1, spec.chain(i - 1)._2)
        val c = contrib.select((leafCols :+ Delta.MULT).map(org.apache.spark.sql.functions.col): _*)
          .persist()
        work += c.count().toDouble
        contribs += c
        // maintain the other complement views
        views = views.zipWithIndex.map {
          case (Some(v), j) if j != i =>
            val dV = chainJoin(spec, leaves, skip = j, replace = Map(i -> di))
            val nv = Delta.merge(v, dV).persist()
            work += dRows // delta-driven view update
            Some(nv)
          case (v, _) => v
        }
        leaves = leaves.updated(i, Delta.merge(leaves(i), di).persist())
      }
    }
    val contribution =
      if (contribs.isEmpty)
        DeltaOps.partialAgg(Delta.attach(chainJoin(spec, leaves, -1).limit(0)), spec.keys, spec.aggs)
      else DeltaOps.partialAgg(Delta.unionAll(contribs.toSeq), spec.keys, spec.aggs)
    val vRows = views.flatten.map(_.count().toDouble).sum
    val lRows = leaves.map(_.count().toDouble).sum
    (HovRt(leaves, views, contribution.persist(), vRows + lRows), work)
  }

  /** Run the plan across all time steps. */
  def run(): ExecReport = {
    val wall = Array.fill(numTimes)(0.0)
    val outputs = mutable.ArrayBuffer[(Int, DataFrame)]()
    for (t <- 0 until numTimes) {
      val start = System.nanoTime()
      for (st <- plan.states if st.time == t) {
        val v = eval(st.plan)
        stateSizes((st.groupId, st.time)) = rowsOf(v)
        cache((st.groupId, st.time)) = v
      }
      for (out <- plan.outputs if out.time == t) {
        val v = eval(out.plan)
        outputs += ((t, Delta.collapse(relOf(v)).persist()))
        outputs.last._2.count()
      }
      wall(t) = (System.nanoTime() - start) / 1e6
    }
    ExecReport(rowsByTime.toVector, wall.toVector, stateSizes.values.sum,
      stateSizes.toVector, outputs.toVector)
  }
}
