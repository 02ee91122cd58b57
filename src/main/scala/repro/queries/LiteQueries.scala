package repro.queries

import repro.core.algebra._
import TpcdsLite._

/** Lite versions of the TPC-DS queries the paper evaluates on.
  *
  * Each query keeps the structural statistics of its original (number of
  * joins / aggregates / subqueries — paper Table 2) and its join flavours
  * (inner / left-outer / left-semi + aggregation), over the TPC-DS-lite
  * schema. `effectiveness` carries the five §8.2 queries, `performance`
  * the ten §8.4 queries.
  */
object LiteQueries {

  final case class LiteQuery(name: String, root: RelOp)

  private def j(l: RelOp, r: RelOp, lk: Seq[String], rk: Seq[String],
                kind: JoinKind = Inner): JoinOp = JoinOp(l, r, kind, lk, rk)
  private def sum(e: Expr, as: String) = AggCall(SumF, Some(e), as)
  private def cnt(as: String) = AggCall(CountStarF, None, as)

  // ------------------------------------------------------------ Table-2 set

  /** Q22-lite: 2 joins, 1 aggregate, 0 subqueries. */
  val q22: RelOp = AggOp(
    j(j(inventory, item, Seq("inv_item"), Seq("i_id")),
      FilterOp(dateDim, Cmp("<", Col("d_moy"), Lit(5L))), Seq("inv_date"), Seq("d_id")),
    Seq("i_category", "i_brand"),
    Seq(AggCall(AvgF, Some(Col("inv_qty")), "qoh")))

  /** Q20-lite: 2 joins, 1 aggregate, 0 subqueries. */
  val q20: RelOp = AggOp(
    j(j(catalogSales,
        FilterOp(item, InList(Col("i_category"), Seq("Books", "Music", "Home"))),
        Seq("cs_item"), Seq("i_id")),
      FilterOp(dateDim, Cmp("=", Col("d_year"), Lit(2005L))), Seq("cs_date"), Seq("d_id")),
    Seq("i_category"), Seq(sum(Col("cs_price"), "itemrevenue")))

  /** Q43-lite: 2 joins, 1 aggregate, 0 subqueries. */
  val q43: RelOp = AggOp(
    j(j(storeSales, store, Seq("ss_store"), Seq("s_id")),
      FilterOp(dateDim, Cmp("=", Col("d_year"), Lit(2001L))), Seq("ss_date"), Seq("d_id")),
    Seq("s_state"), Seq(sum(Col("ss_price"), "store_sales_amt"), cnt("n")))

  /** Q67-lite: 3 joins, 1 aggregate, 2 subqueries. */
  val q67: RelOp = AggOp(
    SubqueryOp("sales_detail",
      j(j(j(storeSales, item, Seq("ss_item"), Seq("i_id")),
          SubqueryOp("dates", FilterOp(dateDim, Cmp(">", Col("d_year"), Lit(2000L)))),
          Seq("ss_date"), Seq("d_id")),
        store, Seq("ss_store"), Seq("s_id"))),
    Seq("i_category", "s_state"), Seq(sum(Arith("*", Col("ss_price"), Col("ss_qty")), "sumsales")))

  /** Q27-lite: 4 joins, 1 aggregate, 0 subqueries. */
  val q27: RelOp = AggOp(
    j(j(j(j(storeSales,
            FilterOp(customerDemographics, Cmp("=", Col("cd_gender"), Lit("F"))),
            Seq("ss_cdemo"), Seq("cd_id")),
          FilterOp(dateDim, Cmp("=", Col("d_year"), Lit(2002L))), Seq("ss_date"), Seq("d_id")),
        store, Seq("ss_store"), Seq("s_id")),
      item, Seq("ss_item"), Seq("i_id")),
    Seq("i_category", "s_state"),
    Seq(AggCall(AvgF, Some(Col("ss_qty")), "agg1"), sum(Col("ss_price"), "agg2")))

  /** Q99-lite: 4 joins, 1 aggregate, 0 subqueries. */
  val q99: RelOp = AggOp(
    j(j(j(j(catalogSales, warehouse, Seq("cs_warehouse"), Seq("w_id")),
          shipMode, Seq("cs_sm"), Seq("sm_id")),
        callCenter, Seq("cs_cc"), Seq("cc_id")),
      FilterOp(dateDim, Cmp(">", Col("d_moy"), Lit(2L))), Seq("cs_date"), Seq("d_id")),
    Seq("w_state", "sm_type", "cc_name"), Seq(cnt("order_cnt"), sum(Col("cs_price"), "amt")))

  /** Q85-lite: 6 joins, 1 aggregate, 0 subqueries. */
  val q85: RelOp = AggOp(
    j(j(j(j(j(j(webSales, webReturns, Seq("ws_order", "ws_item"), Seq("wr_order", "wr_item")),
            customer, Seq("ws_customer"), Seq("c_id")),
          customerDemographics, Seq("c_cdemo"), Seq("cd_id")),
        customerAddress, Seq("c_addr"), Seq("ca_id")),
      FilterOp(dateDim, Cmp("=", Col("d_year"), Lit(2001L))), Seq("ws_date"), Seq("d_id")),
      item, Seq("ws_item"), Seq("i_id")),
    Seq("cd_edu"), Seq(AggCall(AvgF, Some(Col("wr_amt")), "avg_refund"), cnt("n")))

  /** Q91-lite: 6 joins, 1 aggregate, 0 subqueries. */
  val q91: RelOp = AggOp(
    j(j(j(j(j(j(catalogReturns, catalogSales, Seq("cr_order"), Seq("cs_order")),
            callCenter, Seq("cs_cc"), Seq("cc_id")),
          FilterOp(dateDim, Cmp("=", Col("d_moy"), Lit(11L))), Seq("cr_date"), Seq("d_id")),
        customer, Seq("cs_customer"), Seq("c_id")),
      customerDemographics, Seq("c_cdemo"), Seq("cd_id")),
      customerAddress, Seq("c_addr"), Seq("ca_id")),
    Seq("cc_name"), Seq(sum(Col("cr_amt"), "returns_loss")))

  /** Q5-lite: 7 joins, 4 aggregates, 7 subqueries (per-channel sales/returns
    * union subselects rolled up, as in the original).
    */
  val q5: RelOp = {
    def chanAgg(name: String, parts: Seq[RelOp]): RelOp =
      AggOp(UnionAllOp(parts), Seq("chan"),
        Seq(sum(Col("amt"), "sales_amt"), sum(Col("ret"), "ret_amt")))
    val ssPart = SubqueryOp("ss_sales", ProjectOp(
      j(j(storeSales, store, Seq("ss_store"), Seq("s_id")), dateDim, Seq("ss_date"), Seq("d_id")),
      Seq("chan" -> Lit("store"), "amt" -> Col("ss_price"), "ret" -> Lit(0.0))))
    val srPart = SubqueryOp("sr_returns", ProjectOp(
      j(storeReturns, FilterOp(dateDim, Cmp(">", Col("d_year"), Lit(1998L))),
        Seq("sr_date"), Seq("d_id")),
      Seq("chan" -> Lit("store"), "amt" -> Lit(0.0), "ret" -> Col("sr_amt"))))
    val csPart = SubqueryOp("cs_sales", ProjectOp(
      j(catalogSales, warehouse, Seq("cs_warehouse"), Seq("w_id")),
      Seq("chan" -> Lit("catalog"), "amt" -> Col("cs_price"), "ret" -> Lit(0.0))))
    val crPart = SubqueryOp("cr_returns", ProjectOp(
      j(catalogReturns, item, Seq("cr_item"), Seq("i_id")),
      Seq("chan" -> Lit("catalog"), "amt" -> Lit(0.0), "ret" -> Col("cr_amt"))))
    val wsPart = SubqueryOp("ws_sales", ProjectOp(
      j(webSales, customer, Seq("ws_customer"), Seq("c_id")),
      Seq("chan" -> Lit("web"), "amt" -> Col("ws_price"), "ret" -> Lit(0.0))))
    val wrPart = SubqueryOp("wr_returns", ProjectOp(
      j(webReturns, dateDim, Seq("wr_date"), Seq("d_id")),
      Seq("chan" -> Lit("web"), "amt" -> Lit(0.0), "ret" -> Col("wr_amt"))))
    AggOp(
      SubqueryOp("all_channels", UnionAllOp(Seq(
        chanAgg("store", Seq(ssPart, srPart)),
        chanAgg("catalog", Seq(csPart, crPart)),
        chanAgg("web", Seq(wsPart, wrPart))))),
      Seq("chan"), Seq(sum(Col("sales_amt"), "total_sales"), sum(Col("ret_amt"), "total_returns")))
  }

  /** Q33-lite: 9 joins, 4 aggregates, 7 subqueries. */
  val q33: RelOp = {
    def itemF(tag: String) = SubqueryOp(s"item_$tag",
      FilterOp(item, Cmp("=", Col("i_category"), Lit("Books"))))
    val ssChan = SubqueryOp("ss_chan", AggOp(
      j(j(j(storeSales, itemF("ss"), Seq("ss_item"), Seq("i_id")),
          dateDim, Seq("ss_date"), Seq("d_id")),
        store, Seq("ss_store"), Seq("s_id")),
      Seq("i_brand"), Seq(sum(Col("ss_price"), "chan_sales"))))
    val csChan = SubqueryOp("cs_chan", AggOp(
      j(j(j(catalogSales, itemF("cs"), Seq("cs_item"), Seq("i_id")),
          dateDim, Seq("cs_date"), Seq("d_id")),
        warehouse, Seq("cs_warehouse"), Seq("w_id")),
      Seq("i_brand"), Seq(sum(Col("cs_price"), "chan_sales"))))
    val wsChan = SubqueryOp("ws_chan", AggOp(
      j(j(j(webSales, itemF("ws"), Seq("ws_item"), Seq("i_id")),
          dateDim, Seq("ws_date"), Seq("d_id")),
        customer, Seq("ws_customer"), Seq("c_id")),
      Seq("i_brand"), Seq(sum(Col("ws_price"), "chan_sales"))))
    AggOp(SubqueryOp("all_chan", UnionAllOp(Seq(ssChan, csChan, wsChan))),
      Seq("i_brand"), Seq(sum(Col("chan_sales"), "total_sales")))
  }

  // ------------------------------------------------------ effectiveness set

  /** q93-lite: the simplest outer-join consolidation (1 lo join + agg). */
  val q93: RelOp = AggOp(
    ProjectOp(
      j(storeSales, storeReturns, Seq("ss_ticket", "ss_item"), Seq("sr_ticket", "sr_item"),
        LeftOuter),
      Seq("cust" -> Col("ss_customer"),
        "act" -> IfE(IsNullE(Col("sr_amt")), Col("ss_price"),
          Arith("-", Col("ss_price"), Col("sr_amt"))))),
    Seq("cust"), Seq(sum(Col("act"), "net_paid")))

  /** q40-lite: catalog sales/returns outer join + warehouse/item/date dims. */
  val q40: RelOp = AggOp(
    j(j(j(j(catalogSales, catalogReturns, Seq("cs_order", "cs_item"), Seq("cr_order", "cr_item"),
            LeftOuter),
          warehouse, Seq("cs_warehouse"), Seq("w_id")),
        FilterOp(item, Cmp(">", Col("i_price"), Lit(20.0))), Seq("cs_item"), Seq("i_id")),
      dateDim, Seq("cs_date"), Seq("d_id")),
    Seq("w_state", "i_category"),
    Seq(sum(IfE(IsNullE(Col("cr_amt")), Col("cs_price"),
      Arith("-", Col("cs_price"), Col("cr_amt"))), "sales_net")))

  /** q10-lite: semi + two left-outer joins against per-customer activity
    * aggregates (the original's EXISTS/derived-table shape: one row per
    * customer on the right side of each outer join).
    */
  val q10: RelOp = {
    val base = j(customer, customerDemographics, Seq("c_cdemo"), Seq("cd_id"))
    val ssP = ProjectOp(storeSales, Seq("ssc" -> Col("ss_customer")))
    val wsAgg = SubqueryOp("ws_by_cust",
      AggOp(ProjectOp(webSales, Seq("wsc" -> Col("ws_customer"))),
        Seq("wsc"), Seq(AggCall(CountStarF, None, "ws_cnt"))))
    val csAgg = SubqueryOp("cs_by_cust",
      AggOp(ProjectOp(catalogSales, Seq("csc" -> Col("cs_customer"))),
        Seq("csc"), Seq(AggCall(CountStarF, None, "cs_cnt"))))
    val semi = j(base, ssP, Seq("c_id"), Seq("ssc"), LeftSemi)
    val lo1 = j(semi, wsAgg, Seq("c_id"), Seq("wsc"), LeftOuter)
    val lo2 = j(lo1, csAgg, Seq("c_id"), Seq("csc"), LeftOuter)
    AggOp(lo2, Seq("cd_gender", "cd_edu"),
      Seq(cnt("cnt"), AggCall(CountF, Some(Col("ws_cnt")), "web_cnt"),
        AggCall(CountF, Some(Col("cs_cnt")), "cat_cnt")))
  }

  /** q35-lite: address + demographics, semi + two left-outer joins against
    * per-customer aggregates.
    */
  val q35: RelOp = {
    val base = j(j(customer, customerAddress, Seq("c_addr"), Seq("ca_id")),
      customerDemographics, Seq("c_cdemo"), Seq("cd_id"))
    val ssP = ProjectOp(storeSales, Seq("ssc" -> Col("ss_customer")))
    val wsAgg = SubqueryOp("ws_by_cust35",
      AggOp(ProjectOp(webSales, Seq("wsc" -> Col("ws_customer"))),
        Seq("wsc"), Seq(AggCall(CountStarF, None, "ws_cnt"))))
    val csAgg = SubqueryOp("cs_by_cust35",
      AggOp(ProjectOp(catalogSales, Seq("csc" -> Col("cs_customer"))),
        Seq("csc"), Seq(AggCall(CountStarF, None, "cs_cnt"))))
    val semi = j(base, ssP, Seq("c_id"), Seq("ssc"), LeftSemi)
    val lo1 = j(semi, wsAgg, Seq("c_id"), Seq("wsc"), LeftOuter)
    val lo2 = j(lo1, csAgg, Seq("c_id"), Seq("csc"), LeftOuter)
    AggOp(lo2, Seq("ca_state", "cd_gender"),
      Seq(cnt("cnt"), sum(Col("c_month"), "sum_month"),
        AggCall(AvgF, Some(Col("c_month")), "avg_month")))
  }

  /** q80-lite: three sales/returns channels unioned and rolled up. */
  val q80: RelOp = {
    val ssr = j(storeSales, storeReturns, Seq("ss_ticket", "ss_item"), Seq("sr_ticket", "sr_item"),
      LeftOuter)
    val a = ProjectOp(j(j(ssr, dateDim, Seq("ss_date"), Seq("d_id")),
      item, Seq("ss_item"), Seq("i_id")),
      Seq("chan" -> Lit("store"), "sales" -> Col("ss_price"),
        "ret" -> Coalesce(Seq(Col("sr_amt"), Lit(0.0)))))
    val csr = j(catalogSales, catalogReturns, Seq("cs_order", "cs_item"), Seq("cr_order", "cr_item"),
      LeftOuter)
    val b = ProjectOp(j(j(csr, dateDim, Seq("cs_date"), Seq("d_id")),
      item, Seq("cs_item"), Seq("i_id")),
      Seq("chan" -> Lit("catalog"), "sales" -> Col("cs_price"),
        "ret" -> Coalesce(Seq(Col("cr_amt"), Lit(0.0)))))
    val wsr = j(webSales, webReturns, Seq("ws_order", "ws_item"), Seq("wr_order", "wr_item"),
      LeftOuter)
    val c = ProjectOp(j(j(wsr, dateDim, Seq("ws_date"), Seq("d_id")),
      item, Seq("ws_item"), Seq("i_id")),
      Seq("chan" -> Lit("web"), "sales" -> Col("ws_price"),
        "ret" -> Coalesce(Seq(Col("wr_amt"), Lit(0.0)))))
    AggOp(UnionAllOp(Seq(a, b, c)), Seq("chan"),
      Seq(sum(Col("sales"), "sales_amt"), sum(Col("ret"), "returns_amt")))
  }

  val effectiveness: Seq[LiteQuery] = Seq(
    LiteQuery("q93", q93), LiteQuery("q40", q40), LiteQuery("q80", q80),
    LiteQuery("q10", q10), LiteQuery("q35", q35))

  val performance: Seq[LiteQuery] = Seq(
    LiteQuery("q22", q22), LiteQuery("q20", q20), LiteQuery("q43", q43),
    LiteQuery("q67", q67), LiteQuery("q27", q27), LiteQuery("q99", q99),
    LiteQuery("q85", q85), LiteQuery("q91", q91), LiteQuery("q5", q5),
    LiteQuery("q33", q33))

  val all: Seq[LiteQuery] = effectiveness ++ performance

  def byName(n: String): RelOp = all.find(_.name == n).get.root
}
