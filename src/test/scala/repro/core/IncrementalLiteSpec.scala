package repro.core

import repro.SparkSpec
import repro.core.rules.Methods
import repro.queries.{LiteQueries, TpcdsLite}
import repro.queries.TpcdsLite._

/** Incremental end-to-end runs of TPC-DS-lite queries: for each selected
  * (query, arrival pattern, method), optimize, execute across the time
  * steps, and oracle-check the final snapshot against batch DuckDB.
  */
class IncrementalLiteSpec extends SparkSpec {
  private val SF = 0.001

  private val allMethods = Seq(
    "IM-1" -> Methods.im1, "IM-2" -> Methods.im2, "OJV" -> Methods.ojv,
    "HOV" -> Methods.hov, "Tempura" -> Methods.full)

  private def runCase(qName: String, pattern: Pattern, methodName: String,
                      methods: Methods): Unit = {
    val q = LiteQueries.byName(qName)
    val in = TpcdsLite.inputsFor(spark, q, pattern, SF)
    val problem = Harness.problemFromData(q, in, Seq(1), Harness.pdwCost2,
      retractions = pattern.retractTables)
    val (_, exec) = Harness.optimizeAndRun(spark, problem, in, methods)
    Harness.checkFinalOutput(exec, q, in)
  }

  // q93 (simple outer join + agg): full grid of patterns x methods
  for (p <- TpcdsLite.patterns; (mn, m) <- allMethods) {
    test(s"q93 / ${p.name} / $mn") { runCase("q93", p, mn, m) }
  }

  // q40 (outer join + 3 dims): HOV-relevant; with and without retractions
  for (p <- Seq(DeltaBig, DeltaRS); (mn, m) <- Seq(
    "Tempura" -> Methods.full, "HOV" -> Methods.hov, "OJV" -> Methods.ojv)) {
    test(s"q40 / ${p.name} / $mn") { runCase("q40", p, mn, m) }
  }

  // q20 (star inner joins + agg): delta-small favours HOV
  for ((mn, m) <- allMethods) {
    test(s"q20 / delta-small / $mn") { runCase("q20", DeltaSmall, mn, m) }
  }

  // q10 / q35 (semi + multiple lo joins)
  test("q10 / delta-big / Tempura") { runCase("q10", DeltaBig, "Tempura", Methods()) }
  test("q10 / delta-big / IM-2") {
    runCase("q10", DeltaBig, "IM-2", Methods.im2)
  }
  test("q35 / delta-big / Tempura") { runCase("q35", DeltaBig, "Tempura", Methods()) }

  // q80 (three outer-join channels + union)
  test("q80 / delta-big / Tempura") { runCase("q80", DeltaBig, "Tempura", Methods()) }

  // IVM setting: outputs at both times
  test("q93 / delta-big / Tempura under IVM (outputs at every run)") {
    val q = LiteQueries.byName("q93")
    val in = TpcdsLite.inputsFor(spark, q, DeltaBig, SF)
    val problem = Harness.problemFromData(q, in, Seq(0, 1), Harness.ivmCost2)
    val (_, exec) = Harness.optimizeAndRun(spark, problem, in, Methods())
    assert(exec.outputs.size == 2)
    Harness.checkFinalOutput(exec, q, in)
  }
}
