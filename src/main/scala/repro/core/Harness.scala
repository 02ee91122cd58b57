package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.Oracle
import repro.core.algebra.RelOp
import repro.core.cost._
import repro.core.exec.{ExecReport, Executor}
import repro.core.opt.{OptResult, Tempura}
import repro.core.rules.{IqpProblem, Methods, OptFlags}
import repro.core.stats.TvrStats
import repro.core.tvr.Delta

/** Shared helpers for optimizer end-to-end tests and benches. */
object Harness {

  /** Build an IQP problem with stats computed exactly from the input data. */
  def problemFromData(query: RelOp, inputs: Map[String, Vector[DataFrame]],
                      outputTimes: Seq[Int], costFn: CostFn,
                      retractions: Set[String] = Set.empty): IqpProblem = {
    val k = inputs.head._2.size
    val stats = inputs.map { case (t, deltas) =>
      val distinctCols = query.scans.find(_.table == t).get.schema
      t -> TvrStats.fromData(deltas.map(Delta.attach(_).drop(Delta.MULT)), distinctCols,
        hasRetractions = retractions.contains(t))
    }
    IqpProblem(k, query, outputTimes, stats, costFn)
  }

  /** Optimize and execute; returns plan + runtime report. */
  def optimizeAndRun(spark: SparkSession, problem: IqpProblem,
                     inputs: Map[String, Vector[DataFrame]],
                     methods: Methods = Methods(),
                     flags: OptFlags = OptFlags()): (OptResult, ExecReport) = {
    val res = Tempura.optimize(problem, methods, flags)
    val exec = new Executor(spark, res.plan, inputs.view.mapValues(_.map(Delta.attach)).toMap,
      problem.numTimes).run()
    (res, exec)
  }

  /** Oracle-check the final output of an incremental run against batch SQL
    * over the full (merged) inputs.
    */
  def checkFinalOutput(exec: ExecReport, query: RelOp,
                       inputs: Map[String, Vector[DataFrame]]): Unit = {
    val fin = exec.outputs.maxBy(_._1)._2
    val tables = inputs.toSeq.map { case (t, deltas) =>
      t -> Delta.expand(Delta.collapse(Delta.unionAll(deltas.map(Delta.attach))))
    }
    Oracle.assertEquivalent(Delta.expand(fin), query.toSql, tables: _*)
  }

  val pdwCost2: CostFn = WeightedCost(Vector(0.25, 1.0))
  val ivmCost2: CostFn = VectorCost(2)
}
