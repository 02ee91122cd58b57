package repro.core.stats

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.algebra._

/** Cardinality statistics of one relation (a snapshot or a delta). */
final case class RelStats(rows: Double, distinct: Map[String, Double]) {
  /** Distinct count of a column, with a crude default for derived columns. */
  def d(c: String): Double =
    math.max(1.0, math.min(rows, distinct.getOrElse(c, rows / 10.0 + 1.0)))
  def scaledTo(newRows: Double): RelStats =
    RelStats(newRows, distinct.map { case (k, v) => k -> math.min(v, math.max(1.0, newRows)) })
}

object RelStats { val empty: RelStats = RelStats(0.0, Map.empty) }

/** Per-base-table statistics of an IQP problem: delta cardinalities per time
  * step, full-data distinct counts, and whether deltas contain retractions
  * (which gates IM-2's inter-TVR rules).
  */
final case class TvrStats(
    deltaRows: Vector[Double],
    distinct: Map[String, Double],
    hasRetractions: Boolean = false) {
  def numTimes: Int = deltaRows.size
  def snapRows(t: Int): Double = deltaRows.take(t + 1).sum
  def totalRows: Double = deltaRows.sum
  def snapStats(t: Int): RelStats = {
    val r = snapRows(t)
    RelStats(r, distinct.map { case (k, v) => k -> math.min(v, math.max(1.0, r)) })
  }
  def deltaStats(t1: Int, t2: Int): RelStats = {
    val r = (t1 + 1 to t2).map(deltaRows).sum
    RelStats(r, distinct.map { case (k, v) =>
      k -> math.max(1.0, math.min(v * (if (totalRows > 0) r / totalRows else 0.0) + 1.0, r))
    })
  }
}

object TvrStats {
  /** Exact statistics from real per-time delta DataFrames (counts + distinct
    * counts of key-ish columns). Used by benches so the optimizer plans with
    * accurate estimates; the sensitivity experiment perturbs these.
    */
  def fromData(deltas: Vector[DataFrame], distinctCols: Seq[String],
               hasRetractions: Boolean = false): TvrStats = {
    val rows = deltas.map(_.count().toDouble)
    val full = if (deltas.size == 1) deltas.head else deltas.reduce(_ unionByName _)
    val dis = distinctCols.map { c =>
      c -> full.agg(countDistinct(col(c)).as("d")).collect()(0).getLong(0).toDouble
    }.toMap
    TvrStats(rows, dis, hasRetractions)
  }
}

/** Textbook-CBO cardinality estimation for the reproduction algebra, used by
  * the memo to attach [[RelStats]] to every group it creates.
  */
object Estimator {
  def selectivity(p: Expr): Double = p match {
    case Cmp("=", _, _)         => 0.1
    case Cmp("<>", _, _)        => 0.9
    case Cmp(_, _, _)           => 0.3
    case And(a, b)              => selectivity(a) * selectivity(b)
    case Or(a, b)               => math.min(1.0, selectivity(a) + selectivity(b))
    case Not(a)                 => math.max(0.0, 1.0 - selectivity(a))
    case IsNullE(_)             => 0.1
    case InList(_, vs)          => math.min(1.0, 0.1 * vs.size)
    case _                      => 0.25
  }

  def filter(in: RelStats, p: Expr): RelStats = in.scaledTo(in.rows * selectivity(p))

  def project(in: RelStats, exprs: Seq[(String, Expr)]): RelStats =
    RelStats(in.rows, exprs.collect {
      case (n, Col(c)) => n -> in.d(c)
      case (n, _)      => n -> math.max(1.0, in.rows / 10.0)
    }.toMap)

  private def keyDistinct(s: RelStats, keys: Seq[String]): Double =
    math.min(s.rows, keys.map(s.d).product)

  def join(l: RelStats, r: RelStats, kind: JoinKind,
           lk: Seq[String], rk: Seq[String]): RelStats = {
    val dl = keyDistinct(l, lk); val dr = keyDistinct(r, rk)
    val innerRows = if (l.rows == 0 || r.rows == 0) 0.0
      else l.rows * r.rows / math.max(1.0, math.max(dl, dr))
    val rows = kind match {
      case Inner     => innerRows
      case LeftOuter => math.max(innerRows, l.rows)
      case LeftSemi  => l.rows * math.min(1.0, dr / math.max(1.0, dl)) * 0.9
      case LeftAnti  => math.max(0.0, l.rows * (1.0 - math.min(1.0, dr / math.max(1.0, dl)) * 0.9))
    }
    val dis = kind match {
      case LeftSemi | LeftAnti => l.distinct
      case _                   => l.distinct ++ r.distinct
    }
    RelStats(rows, dis.map { case (k, v) => k -> math.min(v, math.max(1.0, rows)) })
  }

  def agg(in: RelStats, keys: Seq[String]): RelStats = {
    val groups = if (keys.isEmpty) 1.0 else math.min(in.rows, keys.map(in.d).product)
    RelStats(groups, keys.map(k => k -> math.min(in.d(k), groups)).toMap)
  }

  def unionAll(ins: Seq[RelStats]): RelStats =
    RelStats(ins.map(_.rows).sum,
      ins.flatMap(_.distinct.keys).distinct.map { k =>
        k -> ins.map(_.d(k)).max
      }.toMap)
}
