package repro.queries

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}
import repro.core.algebra._

/** Batch correctness of every TPC-DS-lite query against the DuckDB oracle,
  * plus the Table-2 structural statistics.
  */
class LiteQueriesSpec extends SparkSpec {
  private val SF = 0.002

  private lazy val tableCache = collection.mutable.HashMap[String, DataFrame]()
  private def table(name: String): DataFrame =
    tableCache.getOrElseUpdate(name, TpcdsLite.genTable(spark, name, SF).cache())

  private def tablesFor(q: RelOp): Map[String, DataFrame] =
    q.scans.map(s => s.table -> table(s.table)).toMap

  for (lq <- LiteQueries.all) {
    test(s"${lq.name} batch result matches DuckDB") {
      val tables = tablesFor(lq.root)
      Oracle.assertEquivalent(lq.root.toDF(tables), lq.root.toSql, tables.toSeq: _*)
    }
  }

  test("Table 2: structural statistics match the paper exactly") {
    for ((name, expected) <- QueryStats.paperTable2) {
      val got = QueryStats.of(LiteQueries.byName(name))
      withClue(s"$name: ") { assert(got == expected) }
    }
  }

  test("effectiveness queries cover inner, left-outer and left-semi joins") {
    def kinds(op: RelOp): Set[JoinKind] = {
      val here: Set[JoinKind] = op match { case JoinOp(_, _, k, _, _) => Set(k); case _ => Set.empty }
      here ++ op.children.flatMap(kinds)
    }
    val all = LiteQueries.effectiveness.map(q => kinds(q.root)).reduce(_ ++ _)
    assert(all.contains(Inner) && all.contains(LeftOuter) && all.contains(LeftSemi))
  }

  test("arrival-pattern split partitions the data exactly") {
    val full = table("store_sales")
    val parts = TpcdsLite.split(full, Seq(0.5, 0.5))
    assert(parts.map(_.count()).sum == full.count())
    val small = TpcdsLite.split(full, Seq(0.8, 0.2))
    assert(small(0).count() > 2L * small(1).count(), "delta-small must front-load data")
  }

  test("retraction injection cancels rows so the final snapshot shrinks") {
    import repro.core.tvr.Delta
    val full = table("store_returns")
    val base = TpcdsLite.split(full, Seq(0.5, 0.5)).map(Delta.attach)
    val withR = TpcdsLite.withRetractions(base, 0.2)
    val finalRows = Delta.collapse(Delta.unionAll(withR)).count()
    assert(finalRows < full.count())
    assert(withR.last.filter(withR.last(Delta.MULT) === -1L).count() > 0)
  }

  test("inputsFor: facts stream, dimensions arrive at t0") {
    val in = TpcdsLite.inputsFor(spark, LiteQueries.q40, TpcdsLite.DeltaBig, SF)
    assert(in("catalog_sales")(1).count() > 0)
    assert(in("warehouse")(1).count() == 0)
    assert(in("warehouse")(0).count() > 0)
  }
}
