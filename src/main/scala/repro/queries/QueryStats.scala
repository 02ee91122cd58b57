package repro.queries

import repro.core.algebra._

/** Structural statistics of a query (paper Table 2): number of joins,
  * aggregates, and subqueries (derived-table boundaries).
  */
final case class QueryStats(joins: Int, aggregates: Int, subQueries: Int)

object QueryStats {
  def of(op: RelOp): QueryStats = {
    var j = 0; var a = 0; var s = 0
    def walk(o: RelOp): Unit = {
      o match {
        case _: JoinOp     => j += 1
        case _: AggOp      => a += 1
        case _: SubqueryOp => s += 1
        case _             => ()
      }
      o.children.foreach(walk)
    }
    walk(op)
    QueryStats(j, a, s)
  }

  /** Paper Table 2 reference values. */
  val paperTable2: Seq[(String, QueryStats)] = Seq(
    "q22" -> QueryStats(2, 1, 0), "q20" -> QueryStats(2, 1, 0), "q43" -> QueryStats(2, 1, 0),
    "q67" -> QueryStats(3, 1, 2), "q27" -> QueryStats(4, 1, 0), "q99" -> QueryStats(4, 1, 0),
    "q85" -> QueryStats(6, 1, 0), "q91" -> QueryStats(6, 1, 0), "q5" -> QueryStats(7, 4, 7),
    "q33" -> QueryStats(9, 4, 7))
}
