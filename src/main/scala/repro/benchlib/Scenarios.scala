package repro.benchlib

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Harness
import repro.core.algebra.RelOp
import repro.core.cost._
import repro.core.exec.{ExecReport, Executor}
import repro.core.opt.{OptResult, Tempura}
import repro.core.rules.{IqpProblem, Methods, OptFlags}
import repro.core.stats.TvrStats
import repro.core.tvr.Delta
import repro.queries.{LiteQueries, TpcdsLite}
import repro.queries.TpcdsLite.Pattern

/** Shared machinery for the evaluation benches and the spark-submit jobs:
  * scenario grids over (query × arrival pattern × incremental method), table
  * printing, and synthetic planning-only statistics for the §8.4 timing
  * experiments.
  */
object Scenarios {

  val methodConfigs: Seq[(String, Methods)] = Seq(
    "IM-1" -> Methods.im1, "IM-2" -> Methods.im2, "OJV" -> Methods.ojv,
    "HOV" -> Methods.hov, "Tempura" -> Methods.full)

  /** IM-2 cannot handle retracting inputs (§8.2). */
  def im2Applicable(q: RelOp, pattern: Pattern): Boolean =
    q.scans.map(_.table).toSet.intersect(pattern.retractTables).isEmpty

  // --------------------------------------------------------------- printing

  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    println()
    println(s"== $title")
    println(fmt(header))
    println(widths.map("-" * _).mkString("|-", "-|-", "-|"))
    rows.foreach(r => println(fmt(r)))
  }

  def rel(v: Double, base: Double): String =
    if (base == 0) "-" else f"${v / base}%.2f"

  // --------------------------------------------------- data-backed scenarios

  final case class Cell(query: String, pattern: Pattern, method: String,
                        opt: Option[OptResult], exec: Option[ExecReport])

  /** Per-(query, pattern) cached inputs + problems. */
  final class Grid(spark: SparkSession, sf: Double, numTimes: Int = 2) {
    private val cache = collection.mutable.HashMap[(String, String), Map[String, Vector[DataFrame]]]()

    def inputs(qName: String, pattern: Pattern): Map[String, Vector[DataFrame]] =
      cache.getOrElseUpdate((qName, pattern.name), {
        val in = TpcdsLite.inputsFor(spark, LiteQueries.byName(qName), pattern, sf, numTimes)
        in.view.mapValues(_.map(d => { val p = d.persist(); p.count(); p })).toMap
      })

    def problem(qName: String, pattern: Pattern, costFn: CostFn,
                outputTimes: Seq[Int]): IqpProblem = {
      val q = LiteQueries.byName(qName)
      Harness.problemFromData(q, inputs(qName, pattern), outputTimes, costFn,
        retractions = pattern.retractTables)
    }

    def optimizeCell(qName: String, pattern: Pattern, costFn: CostFn,
                     outputTimes: Seq[Int], method: String): Option[OptResult] = {
      if (method == "IM-2" && !im2Applicable(LiteQueries.byName(qName), pattern)) None
      else {
        val m = methodConfigs.find(_._1 == method).get._2
        Some(Tempura.optimize(problem(qName, pattern, costFn, outputTimes), m))
      }
    }

    def runCell(qName: String, pattern: Pattern, costFn: CostFn,
                outputTimes: Seq[Int], method: String): Option[(OptResult, ExecReport)] =
      optimizeCell(qName, pattern, costFn, outputTimes, method).map { res =>
        val exec = new Executor(spark, res.plan,
          inputs(qName, pattern).view.mapValues(_.map(Delta.attach)).toMap, numTimes).run()
        (res, exec)
      }
  }

  // ------------------------------------------------ planning-only statistics

  /** Synthetic per-table statistics for timing experiments (§8.4): no Spark
    * needed, sizes follow the TPC-DS-lite proportions at the given SF.
    */
  def syntheticStats(q: RelOp, sf: Double, numTimes: Int,
                     retract: Boolean = false): Map[String, TvrStats] =
    q.scans.map { s =>
      val total = TpcdsLite.approxRows(s.table, sf)
      val deltas =
        if (TpcdsLite.factTables.contains(s.table))
          Vector.tabulate(numTimes)(i => total / numTimes max 1.0)
        else (total +: Vector.fill(numTimes - 1)(0.0))
      val distinct = s.schema.map { c =>
        c -> (if (c.endsWith("_id") || c.contains("order") || c.contains("ticket")) total / 2 + 1
              else math.max(2.0, total / 50))
      }.toMap
      s.table -> TvrStats(deltas, distinct,
        hasRetractions = retract && TpcdsLite.factTables.contains(s.table))
    }.toMap

  def planningProblem(q: RelOp, numTimes: Int, sf: Double = 1.0): IqpProblem = {
    val weights = Vector.tabulate(numTimes)(i => if (i == numTimes - 1) 1.0 else 0.3)
    IqpProblem(numTimes, q, Seq(numTimes - 1), syntheticStats(q, sf, numTimes),
      WeightedCost(weights))
  }

  /** Time one optimize call (with a small JIT warm-up on first use). */
  def timeOptimize(p: IqpProblem, m: Methods, flags: OptFlags = OptFlags(),
                   warmups: Int = 1): OptResult = {
    (0 until warmups).foreach(_ => Tempura.optimize(p, m, flags))
    Tempura.optimize(p, m, flags)
  }
}
