package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.benchlib.Scenarios
import repro.benchlib.Scenarios.{Grid, planningProblem, timeOptimize}
import repro.core.cost.{VectorCost, WeightedCost}
import repro.core.rules.Methods
import repro.queries._
import repro.queries.TpcdsLite._

/** spark-submit entrypoints, one per evaluation table/figure. Each prints
  * the same rows as the corresponding bench suite; scale via args(0) = SF.
  */
object JobUtil {
  def session(name: String): SparkSession = SparkSession.builder()
    .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
    .appName(name)
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
  def sfOf(args: Array[String], default: Double): Double =
    args.headOption.map(_.toDouble).getOrElse(default)
}

/** Table 1 — workload statistics of the synthetic W-A / W-B. */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val rows = Seq("W-A" -> 274, "W-B" -> 554).map { case (name, n) =>
      val s = WorkloadGen.stats(WorkloadGen.workload(name, n, seed = name.hashCode))
      Seq(name, s.nQueries.toString, f"${s.avgJoins}%.2f", s.maxJoins.toString,
        f"${s.avgAggs}%.2f", f"${s.pctOuterJoin}%.1f%%", s.nTables.toString)
    }
    Scenarios.printTable("Table 1 — workload statistics",
      Seq("workload", "#queries", "avg joins", "max joins", "avg aggs",
        "% outer-join jobs", "#tables"), rows)
  }
}

/** Table 2 — structural statistics of the representative queries. */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val rows = QueryStats.paperTable2.map { case (name, paper) =>
      val ours = QueryStats.of(LiteQueries.byName(name))
      Seq(name, paper.joins.toString, ours.joins.toString, paper.aggregates.toString,
        ours.aggregates.toString, paper.subQueries.toString, ours.subQueries.toString)
    }
    Scenarios.printTable("Table 2 — query statistics (paper vs lite)",
      Seq("query", "#joins (paper)", "#joins (ours)", "#aggs (paper)", "#aggs (ours)",
        "#subq (paper)", "#subq (ours)"), rows)
  }
}

/** Fig 6 — optimal estimated costs per incremental method. */
object Fig6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig6")
    val grid = new Grid(spark, JobUtil.sfOf(args, 0.02))
    val methods = Scenarios.methodConfigs.map(_._1)
    val queries = Seq("q93", "q40", "q80", "q10", "q35")
    def row(label: String, q: String, p: Pattern,
            cf: repro.core.cost.CostFn, outs: Seq[Int]): Seq[String] = {
      val cells = methods.map(m => grid.optimizeCell(q, p, cf, outs, m)
        .map(r => cf.scalarize(r.estCost)))
      val base = cells.head.get
      label +: cells.map(_.map(v => Scenarios.rel(v, base)).getOrElse("n/a"))
    }
    Scenarios.printTable("Fig 6(a) — IVM-PD, delta-big", "query" +: methods,
      queries.map(q => row(q, q, DeltaBig, VectorCost(2), Seq(0, 1))))
    Scenarios.printTable("Fig 6(b) — IVM-PD, q10 by pattern", "pattern" +: methods,
      patterns.map(p => row(p.name, "q10", p, VectorCost(2), Seq(0, 1))))
    Scenarios.printTable("Fig 6(c) — PDW-PD, delta-big, w1=0.3", "query" +: methods,
      queries.map(q => row(q, q, DeltaBig, WeightedCost(Vector(0.3, 1.0)), Seq(1))))
    Scenarios.printTable("Fig 6(d) — PDW-PD, q10 by pattern/w1", "cell" +: methods,
      (for (w1 <- Seq(0.3, 0.7); p <- patterns)
        yield row(s"${p.name}/w1=$w1", "q10", p, WeightedCost(Vector(w1, 1.0)), Seq(1))))
    spark.stop()
  }
}

/** Fig 7 — real execution costs and state sizes. */
object Fig7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("fig7")
    val grid = new Grid(spark, JobUtil.sfOf(args, 0.01))
    val methods = Scenarios.methodConfigs.map(_._1)
    val queries = Seq("q93", "q40", "q80", "q10", "q35")
    val rows = queries.map { q =>
      val cells = methods.map(m =>
        grid.runCell(q, DeltaBig, VectorCost(2), Seq(0, 1), m)
          .map { case (_, e) => (e.perTimeRows.last, e.stateRows) })
      val base = cells.head.get._1
      q +: (cells.map(_.map(c => Scenarios.rel(c._1, base)).getOrElse("n/a")) ++
        cells.map(_.map(c => f"${c._2}%.0f").getOrElse("n/a")))
    }
    Scenarios.printTable("Fig 7 — real last-run cost (rel. IM-1) and state rows",
      ("query" +: methods.map(_ + " cost")) ++ methods.map(_ + " state"), rows)
    spark.stop()
  }
}

/** Fig 8 — planning performance (pure optimizer). */
object Fig8Job {
  def main(args: Array[String]): Unit = {
    val rows = LiteQueries.all.map { lq =>
      val r = timeOptimize(planningProblem(lq.root, 3), Methods())
      Seq(lq.name, f"${r.pseMillis}%.1f ms", f"${r.smoMillis}%.1f ms",
        r.memoGroups.toString, r.memoNodes.toString)
    }
    Scenarios.printTable("Fig 8 — planning time (|T|=3, all methods)",
      Seq("query", "PSE", "SMO", "groups", "nodes"), rows)
  }
}

/** Fig 6(e)(f)/7(h)(i) — PDW case study (downscaled). */
object CaseStudyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("case-study")
    val sf = JobUtil.sfOf(args, 0.005)
    val nJobs = args.lift(1).map(_.toInt).getOrElse(6)
    val weights = Vector(0.25, 0.3, 1.0)
    val cf = WeightedCost(weights)
    import repro.core.Harness
    import repro.core.exec.Executor
    import repro.core.opt.Tempura
    import repro.core.tvr.Delta
    val jobs = WorkloadGen.workload("W-A", nJobs, 1) ++ WorkloadGen.workload("W-B", nJobs, 2)
    val rows = jobs.map { job =>
      val in = TpcdsLite.inputsFor(spark, job.query, job.pattern, sf, numTimes = 3)
        .view.mapValues(_.map(Delta.attach)).toMap
      val pRes = Tempura.optimize(Harness.problemFromData(job.query, in, Seq(2), cf))
      val pExec = new Executor(spark, pRes.plan, in, 3).run()
      val batched = in.view.mapValues(ds =>
        Vector(Delta.empty(ds.head), Delta.empty(ds.head), Delta.collapse(Delta.unionAll(ds)))).toMap
      val tRes = Tempura.optimize(Harness.problemFromData(job.query, batched, Seq(2), cf))
      val tExec = new Executor(spark, tRes.plan, batched, 3).run()
      Seq(job.name, f"${tExec.weighted(weights)}%.0f", f"${pExec.weighted(weights)}%.0f",
        f"${pExec.weighted(weights) / math.max(tExec.weighted(weights), 1e-9)}%.2f")
    }
    Scenarios.printTable("Case study — per-job TDW vs PDW weighted cost",
      Seq("job", "TDW", "PDW", "ratio"), rows)
    spark.stop()
  }
}
