package repro.core

import repro.{Oracle, SparkSpec, SynthData}
import repro.core.algebra._
import repro.queries.RunningExample

/** Batch semantics of the reproduction algebra, cross-checked against DuckDB
  * for every operator and join flavour.
  */
class AlgebraSpec extends SparkSpec {

  private lazy val sales = RunningExample.salesDf(spark,
    RunningExample.salesT1 ++ RunningExample.salesT2)
  private lazy val rets = RunningExample.returnsDf(spark,
    RunningExample.returnsT1 ++ RunningExample.returnsT2)
  private lazy val tables = Map("sales" -> sales, "returns" -> rets)

  private def check(q: RelOp): Unit =
    Oracle.assertEquivalent(q.toDF(tables), q.toSql, "sales" -> sales, "returns" -> rets)

  import RunningExample.{salesScan, returnsScan}

  test("scan") { check(salesScan) }

  test("filter with comparison") {
    check(FilterOp(salesScan, Cmp(">", Col("s_price"), Lit(120.0))))
  }

  test("filter with conjunction and IN list") {
    check(FilterOp(salesScan,
      And(InList(Col("s_cat"), Seq("c1", "c2")), Cmp("<=", Col("s_oid"), Lit(5L)))))
  }

  test("project with arithmetic and CASE") {
    check(ProjectOp(salesScan, Seq(
      "oid"   -> Col("s_oid"),
      "taxed" -> Arith("*", Col("s_price"), Lit(1.1)),
      "tier"  -> IfE(Cmp(">", Col("s_price"), Lit(150.0)), Lit("hi"), Lit("lo")))))
  }

  test("inner join") {
    check(JoinOp(salesScan, returnsScan, Inner, Seq("s_oid"), Seq("r_oid")))
  }

  test("left outer join") { check(RunningExample.salesStatus) }

  test("left semi join") {
    check(JoinOp(salesScan, returnsScan, LeftSemi, Seq("s_oid"), Seq("r_oid")))
  }

  test("left anti join") {
    check(JoinOp(salesScan, returnsScan, LeftAnti, Seq("s_oid"), Seq("r_oid")))
  }

  test("aggregate SUM with null-aware CASE (summary query)") {
    check(RunningExample.summary)
  }

  test("aggregate COUNT, COUNT(*), AVG") {
    check(AggOp(RunningExample.salesStatus, Seq("s_cat"), Seq(
      AggCall(CountF, Some(Col("r_cost")), "n_returned"),
      AggCall(CountStarF, None, "n_orders"),
      AggCall(AvgF, Some(Col("s_price")), "avg_price"))))
  }

  test("global aggregate (no group keys)") {
    check(AggOp(salesScan, Nil, Seq(
      AggCall(SumF, Some(Col("s_price")), "total"),
      AggCall(CountStarF, None, "n"))))
  }

  test("union all") {
    val a = FilterOp(salesScan, Cmp("=", Col("s_cat"), Lit("c1")))
    val b = FilterOp(salesScan, Cmp("=", Col("s_cat"), Lit("c2")))
    check(UnionAllOp(Seq(a, b)))
  }

  test("aggregate over union of projections") {
    val p1 = ProjectOp(salesScan, Seq("cat" -> Col("s_cat"), "amt" -> Col("s_price")))
    val p2 = ProjectOp(salesScan,
      Seq("cat" -> Col("s_cat"), "amt" -> Arith("*", Col("s_price"), Lit(2.0))))
    check(AggOp(UnionAllOp(Seq(p1, p2)), Seq("cat"), Seq(AggCall(SumF, Some(Col("amt")), "s"))))
  }

  test("schema derivation per operator") {
    assert(RunningExample.salesStatus.schema ==
      Seq("s_oid", "s_cat", "s_price", "r_oid", "r_cost"))
    assert(RunningExample.summary.schema == Seq("s_cat", "gross"))
    assert(JoinOp(salesScan, returnsScan, LeftSemi, Seq("s_oid"), Seq("r_oid")).schema ==
      salesScan.schema)
  }

  test("join rejects colliding column names") {
    intercept[IllegalArgumentException] {
      JoinOp(salesScan, salesScan, Inner, Seq("s_oid"), Seq("s_oid"))
    }
  }

  test("expression refs") {
    assert(RunningExample.revenueExpr.refs == Set("r_cost", "s_price"))
  }

  test("TPC-H-lite: revenue per returnflag vs oracle") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val scan = Scan("lineitem", Seq(
      "l_orderkey" -> TLong, "l_quantity" -> TDouble, "l_extendedprice" -> TDouble,
      "l_discount" -> TDouble, "l_returnflag" -> TString))
    val q = AggOp(
      FilterOp(scan.copy(), Cmp("<", Col("l_quantity"), Lit(30.0))),
      Seq("l_returnflag"),
      Seq(AggCall(SumF, Some(Arith("*", Col("l_extendedprice"),
        Arith("-", Lit(1.0), Col("l_discount")))), "revenue"),
        AggCall(CountStarF, None, "n")))
    val liProj = li.select("l_orderkey", "l_quantity", "l_extendedprice", "l_discount", "l_returnflag")
    Oracle.assertEquivalent(q.toDF(Map("lineitem" -> liProj)), q.toSql, "lineitem" -> liProj)
  }
}
