package repro.queries

import scala.util.Random
import repro.core.algebra._
import TpcdsLite._

/** Synthetic stand-ins for the paper's proprietary Alibaba progressive-
  * data-warehouse workloads W-A (274 recurring daily jobs) and W-B (554
  * jobs). Jobs are sampled from parameterized templates of the lite queries
  * (varying filter constants, group keys and arrival patterns), which
  * preserves what Table 1 characterizes: a mix of join-heavy and
  * aggregate-heavy recurring analysis jobs over shared fact tables.
  * Substitution documented in DESIGN.md §2.
  */
object WorkloadGen {

  final case class Job(name: String, query: RelOp, pattern: Pattern)

  private def sum(e: Expr, as: String) = AggCall(SumF, Some(e), as)

  /** Parameterized query templates. */
  private val templates: Vector[(String, Int => RelOp)] = Vector(
    "t_store_daily" -> { i =>
      AggOp(
        JoinOp(JoinOp(storeSales, store, Inner, Seq("ss_store"), Seq("s_id")),
          FilterOp(dateDim, Cmp("=", Col("d_year"), Lit(1998L + i % 20))),
          Inner, Seq("ss_date"), Seq("d_id")),
        Seq("s_state"), Seq(sum(Col("ss_price"), "amt"), AggCall(CountStarF, None, "n")))
    },
    "t_item_rev" -> { i =>
      AggOp(
        JoinOp(catalogSales,
          FilterOp(item, Cmp("=", Col("i_category"),
            Lit(Seq("Books", "Home", "Electronics", "Music", "Sports", "Shoes")(i % 6)))),
          Inner, Seq("cs_item"), Seq("i_id")),
        Seq("i_brand"), Seq(sum(Col("cs_price"), "rev")))
    },
    "t_consolidate" -> { i =>
      AggOp(
        ProjectOp(
          JoinOp(storeSales, storeReturns, LeftOuter,
            Seq("ss_ticket", "ss_item"), Seq("sr_ticket", "sr_item")),
          Seq("grp" -> Col(if (i % 2 == 0) "ss_store" else "ss_customer"),
            "net" -> IfE(IsNullE(Col("sr_amt")), Col("ss_price"),
              Arith("-", Col("ss_price"), Col("sr_amt"))))),
        Seq("grp"), Seq(sum(Col("net"), "net_amt")))
    },
    "t_catalog_net" -> { i =>
      AggOp(
        JoinOp(
          JoinOp(catalogSales, catalogReturns, LeftOuter,
            Seq("cs_order", "cs_item"), Seq("cr_order", "cr_item")),
          FilterOp(warehouse, InList(Col("w_state"), Seq("CA", "TX", "NY").take(1 + i % 3))),
          Inner, Seq("cs_warehouse"), Seq("w_id")),
        Seq("w_state"),
        Seq(sum(IfE(IsNullE(Col("cr_amt")), Col("cs_price"),
          Arith("-", Col("cs_price"), Col("cr_amt"))), "net")))
    },
    "t_web_activity" -> { i =>
      AggOp(
        JoinOp(JoinOp(webSales, customer, Inner, Seq("ws_customer"), Seq("c_id")),
          FilterOp(customerDemographics, Cmp("=", Col("cd_gender"), Lit(if (i % 2 == 0) "M" else "F"))),
          Inner, Seq("c_cdemo"), Seq("cd_id")),
        Seq("cd_edu"), Seq(sum(Col("ws_price"), "spend"), AggCall(CountStarF, None, "orders")))
    },
    "t_ship_perf" -> { i =>
      AggOp(
        JoinOp(JoinOp(catalogSales, shipMode, Inner, Seq("cs_sm"), Seq("sm_id")),
          FilterOp(dateDim, Cmp(">", Col("d_moy"), Lit((i % 10).toLong))),
          Inner, Seq("cs_date"), Seq("d_id")),
        Seq("sm_type"), Seq(AggCall(AvgF, Some(Col("cs_qty")), "avg_qty")))
    })

  def workload(name: String, nJobs: Int, seed: Long): Seq[Job] = {
    val rnd = new Random(seed)
    (0 until nJobs).map { i =>
      val (tName, mk) = templates(rnd.nextInt(templates.size))
      val pattern = if (rnd.nextBoolean()) DeltaBig else DeltaSmall
      Job(s"$name-$tName-$i", mk(rnd.nextInt(1000)), pattern)
    }
  }

  /** Table-1-style workload characterization. */
  final case class WorkloadStats(
      nQueries: Int, avgJoins: Double, maxJoins: Int, avgAggs: Double,
      pctOuterJoin: Double, nTables: Int)

  def stats(jobs: Seq[Job]): WorkloadStats = {
    val qs = jobs.map(j => QueryStats.of(j.query))
    def hasOuter(op: RelOp): Boolean = op match {
      case JoinOp(_, _, LeftOuter, _, _) => true
      case o => o.children.exists(hasOuter)
    }
    WorkloadStats(
      jobs.size,
      qs.map(_.joins).sum.toDouble / jobs.size,
      qs.map(_.joins).max,
      qs.map(_.aggregates).sum.toDouble / jobs.size,
      100.0 * jobs.count(j => hasOuter(j.query)) / jobs.size,
      jobs.flatMap(_.query.scans.map(_.table)).distinct.size)
  }
}
