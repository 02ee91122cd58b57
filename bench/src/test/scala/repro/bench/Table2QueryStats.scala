package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib.Scenarios
import repro.queries.{LiteQueries, QueryStats}

/** Paper Table 2: structural statistics of the ten representative TPC-DS
  * queries. Our lite queries are constructed to match the paper's counts
  * exactly; this bench prints paper-vs-ours side by side.
  */
class Table2QueryStats extends AnyFunSuite {

  test("Table 2: statistics of selected representative queries") {
    val rows = QueryStats.paperTable2.map { case (name, paper) =>
      val ours = QueryStats.of(LiteQueries.byName(name))
      Seq(name,
        paper.joins.toString, ours.joins.toString,
        paper.aggregates.toString, ours.aggregates.toString,
        paper.subQueries.toString, ours.subQueries.toString)
    }
    Scenarios.printTable("Table 2 — query statistics (paper vs lite)",
      Seq("query", "#joins (paper)", "#joins (ours)", "#aggs (paper)", "#aggs (ours)",
        "#subq (paper)", "#subq (ours)"), rows)
    for ((name, paper) <- QueryStats.paperTable2)
      assert(QueryStats.of(LiteQueries.byName(name)) == paper, s"$name diverges from Table 2")
  }
}
