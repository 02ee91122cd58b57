package repro.queries

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.algebra._

/** The paper's running example (Example 1): consolidate `sales` orders with
  * `returns` and report gross revenue per category.
  *
  * {{{
  * sales_status = sales LEFT OUTER JOIN returns ON o_id
  * summary      = SELECT cat, SUM(IF(cost IS NULL, price, price - cost))
  *                FROM sales_status GROUP BY cat
  * }}}
  *
  * Data arrives in two (or more) increments; variants add retractions to
  * reproduce the §2.2 delta patterns.
  */
object RunningExample {
  val salesScan: Scan = Scan("sales",
    Seq("s_oid" -> TLong, "s_cat" -> TString, "s_price" -> TDouble))
  val returnsScan: Scan = Scan("returns",
    Seq("r_oid" -> TLong, "r_cost" -> TDouble))

  val salesStatus: RelOp =
    JoinOp(salesScan, returnsScan, LeftOuter, Seq("s_oid"), Seq("r_oid"))

  val revenueExpr: Expr =
    IfE(IsNullE(Col("r_cost")), Col("s_price"), Arith("-", Col("s_price"), Col("r_cost")))

  val summary: RelOp =
    AggOp(salesStatus, Seq("s_cat"), Seq(AggCall(SumF, Some(revenueExpr), "gross")))

  /** Inner-join + aggregate variant (no outer join), for rule coverage. */
  val innerSummary: RelOp =
    AggOp(JoinOp(salesScan, returnsScan, Inner, Seq("s_oid"), Seq("r_oid")),
      Seq("s_cat"), Seq(AggCall(SumF, Some(Arith("-", Col("s_price"), Col("r_cost"))), "net")))

  def salesDf(spark: SparkSession, rows: Seq[(Long, String, Double)]): DataFrame = {
    import spark.implicits._
    rows.toDF("s_oid", "s_cat", "s_price")
  }

  def returnsDf(spark: SparkSession, rows: Seq[(Long, Double)]): DataFrame = {
    import spark.implicits._
    rows.toDF("r_oid", "r_cost")
  }

  /** Delta arriving at t1 (Fig. 1(a), left of the line). */
  def salesT1: Seq[(Long, String, Double)] =
    Seq((1L, "c1", 100.0), (2L, "c2", 150.0), (3L, "c1", 120.0), (4L, "c1", 170.0))
  def returnsT1: Seq[(Long, Double)] = Seq((1L, 10.0))

  /** Delta arriving at t2. */
  def salesT2: Seq[(Long, String, Double)] =
    Seq((5L, "c2", 300.0), (6L, "c1", 150.0), (7L, "c2", 220.0))
  def returnsT2: Seq[(Long, Double)] = Seq((2L, 20.0), (6L, 15.0))
}
