package repro.core.algebra

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Column types, used only to generate CAST wrappers for the DuckDB oracle
  * (the oracle stores every column as VARCHAR).
  */
sealed trait ColType { def ddl: String }
case object TLong   extends ColType { val ddl = "BIGINT" }
case object TDouble extends ColType { val ddl = "DOUBLE" }
case object TString extends ColType { val ddl = "VARCHAR" }
case object TDate   extends ColType { val ddl = "DATE" }

sealed trait JoinKind { def sparkName: String }
case object Inner     extends JoinKind { val sparkName = "inner" }
case object LeftOuter extends JoinKind { val sparkName = "left_outer" }
case object LeftSemi  extends JoinKind { val sparkName = "left_semi" }
case object LeftAnti  extends JoinKind { val sparkName = "left_anti" }

/** Logical relational algebra of the reproduction.
  *
  * This is the algebra the Tempura memo explores. It intentionally covers
  * exactly the operator vocabulary the paper's evaluation exercises: scans,
  * filters, projections, equi-joins (inner / left-outer / left-semi /
  * left-anti), bag union, and group-by aggregation.
  *
  * Invariant: all column names are globally unique within a query (enforced
  * at construction for joins), which lets every backend resolve columns by
  * name without qualification.
  */
sealed trait RelOp {
  def children: Seq[RelOp]

  /** Output column names, in order. */
  def schema: Seq[String]

  /** Per-column types (parallel to [[schema]]). */
  def types: Seq[ColType]

  def typeOf(c: String): ColType = types(schema.indexOf(c))

  /** Compile to a batch DataFrame over the given base tables. */
  def toDF(tables: Map[String, DataFrame]): DataFrame = this match {
    case Scan(t, cols) =>
      tables(t).select(cols.map(c => col(c._1)): _*)
    case FilterOp(c, p) => c.toDF(tables).filter(p.toColumn)
    case ProjectOp(c, exprs) =>
      c.toDF(tables).select(exprs.map { case (n, e) => e.toColumn.as(n) }: _*)
    case j @ JoinOp(l, r, kind, lk, rk) =>
      val (ld, rd) = (l.toDF(tables), r.toDF(tables))
      val cond = j.joinCond(ld, rd)
      kind match {
        case LeftSemi | LeftAnti => ld.join(rd, cond, kind.sparkName)
        case _                   => ld.join(rd, cond, kind.sparkName)
      }
    case AggOp(c, keys, aggs) =>
      val df = c.toDF(tables)
      val cols = aggs.map { a =>
        (a.fn match {
          case SumF       => sum(a.arg.get.toColumn)
          case CountF     => count(a.arg.get.toColumn)
          case CountStarF => count(lit(1))
          case AvgF       => avg(a.arg.get.toColumn)
          case MinF       => min(a.arg.get.toColumn)
          case MaxF       => max(a.arg.get.toColumn)
        }).as(a.name)
      }
      if (keys.isEmpty) df.agg(cols.head, cols.tail: _*)
      else df.groupBy(keys.map(col): _*).agg(cols.head, cols.tail: _*)
    case UnionAllOp(cs) =>
      cs.map(_.toDF(tables).select(schema.map(col): _*)).reduce(_.unionAll(_))
    case SubqueryOp(_, c) => c.toDF(tables)
  }

  /** Render as SQL for the DuckDB oracle. Scans emit CAST wrappers because
    * the oracle loads every column as VARCHAR.
    */
  def toSql: String = RelOp.render(this)

  /** All base tables scanned anywhere below (with their column defs). */
  def scans: Seq[Scan] = this match {
    case s: Scan => Seq(s)
    case o       => o.children.flatMap(_.scans).distinct
  }
}

final case class Scan(table: String, cols: Seq[(String, ColType)]) extends RelOp {
  val children: Seq[RelOp] = Nil
  val schema: Seq[String] = cols.map(_._1)
  val types: Seq[ColType] = cols.map(_._2)
}

final case class FilterOp(child: RelOp, pred: Expr) extends RelOp {
  val children: Seq[RelOp] = Seq(child)
  def schema: Seq[String] = child.schema
  def types: Seq[ColType] = child.types
}

final case class ProjectOp(child: RelOp, exprs: Seq[(String, Expr)]) extends RelOp {
  val children: Seq[RelOp] = Seq(child)
  def schema: Seq[String] = exprs.map(_._1)
  def types: Seq[ColType] = exprs.map {
    case (_, Col(c))         => child.typeOf(c)
    case (_, NullLit(t))     => t
    case (_, Lit(_: String)) => TString
    case (_, IfE(_, Lit(_: String), _)) => TString
    case _                   => TDouble
  }
}

final case class JoinOp(left: RelOp, right: RelOp, kind: JoinKind,
                        leftKeys: Seq[String], rightKeys: Seq[String]) extends RelOp {
  require(leftKeys.nonEmpty && leftKeys.size == rightKeys.size, "equi-join keys required")
  require(left.schema.intersect(right.schema).isEmpty,
    s"join column collision: ${left.schema.intersect(right.schema)}")
  val children: Seq[RelOp] = Seq(left, right)
  def schema: Seq[String] = kind match {
    case LeftSemi | LeftAnti => left.schema
    case _                   => left.schema ++ right.schema
  }
  def types: Seq[ColType] = kind match {
    case LeftSemi | LeftAnti => left.types
    case _                   => left.types ++ right.types
  }
  def joinCond(ld: DataFrame, rd: DataFrame): Column =
    leftKeys.zip(rightKeys).map { case (a, b) => ld(a) === rd(b) }.reduce(_ && _)
}

final case class AggOp(child: RelOp, groupKeys: Seq[String], aggs: Seq[AggCall]) extends RelOp {
  require(aggs.nonEmpty, "aggregate needs at least one aggregate call")
  val children: Seq[RelOp] = Seq(child)
  def schema: Seq[String] = groupKeys ++ aggs.map(_.name)
  def types: Seq[ColType] =
    groupKeys.map(child.typeOf) ++ aggs.map { a =>
      a.fn match {
        case CountF | CountStarF => TLong
        case MinF | MaxF => a.arg.map(_.refs.headOption.map(child.typeOf).getOrElse(TDouble)).getOrElse(TDouble)
        case _ => TDouble
      }
    }
}

/** Named derived-table boundary (a CTE / subselect in the original SQL).
  * Semantically transparent; exists so structural statistics (paper Table 2)
  * can count subqueries, and so SQL rendering mirrors the original nesting.
  */
final case class SubqueryOp(name: String, child: RelOp) extends RelOp {
  val children: Seq[RelOp] = Seq(child)
  def schema: Seq[String] = child.schema
  def types: Seq[ColType] = child.types
}

final case class UnionAllOp(inputs: Seq[RelOp]) extends RelOp {
  require(inputs.size >= 2, "union needs at least two inputs")
  require(inputs.forall(_.schema == inputs.head.schema),
    "union inputs must share a schema")
  val children: Seq[RelOp] = inputs
  def schema: Seq[String] = inputs.head.schema
  def types: Seq[ColType] = inputs.head.types
}

object RelOp {
  private def castedScan(s: Scan): String = {
    val cols = s.cols.map { case (c, t) => s"CAST($c AS ${t.ddl}) AS $c" }
    s"SELECT ${cols.mkString(", ")} FROM ${s.table}"
  }

  private[algebra] def render(op: RelOp): String = {
    var aliasId = 0
    def alias(): String = { aliasId += 1; s"t$aliasId" }
    def go(op: RelOp): String = op match {
      case s: Scan => castedScan(s)
      case FilterOp(c, p) =>
        s"SELECT * FROM (${go(c)}) ${alias()} WHERE ${p.toSql}"
      case ProjectOp(c, exprs) =>
        val items = exprs.map { case (n, e) => s"${e.toSql} AS $n" }
        s"SELECT ${items.mkString(", ")} FROM (${go(c)}) ${alias()}"
      case JoinOp(l, r, kind, lk, rk) =>
        val (la, ra) = (alias(), alias())
        val on = lk.zip(rk).map { case (a, b) => s"$la.$a = $ra.$b" }.mkString(" AND ")
        kind match {
          case Inner =>
            s"SELECT * FROM (${go(l)}) $la JOIN (${go(r)}) $ra ON $on"
          case LeftOuter =>
            s"SELECT * FROM (${go(l)}) $la LEFT JOIN (${go(r)}) $ra ON $on"
          case LeftSemi =>
            s"SELECT * FROM (${go(l)}) $la WHERE EXISTS (SELECT 1 FROM (${go(r)}) $ra WHERE $on)"
          case LeftAnti =>
            s"SELECT * FROM (${go(l)}) $la WHERE NOT EXISTS (SELECT 1 FROM (${go(r)}) $ra WHERE $on)"
        }
      case AggOp(c, keys, aggs) =>
        val items = keys ++ aggs.map(_.toSql)
        val groupBy = if (keys.isEmpty) "" else s" GROUP BY ${keys.mkString(", ")}"
        s"SELECT ${items.mkString(", ")} FROM (${go(c)}) ${alias()}$groupBy"
      case UnionAllOp(cs) =>
        cs.map(c => s"SELECT ${op.schema.mkString(", ")} FROM (${go(c)}) ${alias()}")
          .mkString(" UNION ALL ")
      case SubqueryOp(_, c) => s"SELECT * FROM (${go(c)}) ${alias()}"
    }
    go(op)
  }

  /** Run a query as batch Spark SQL via the DataFrame compiler. */
  def run(spark: SparkSession, q: RelOp, tables: Map[String, DataFrame]): DataFrame =
    q.toDF(tables)
}
