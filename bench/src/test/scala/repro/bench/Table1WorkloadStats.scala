package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.benchlib.Scenarios
import repro.queries.WorkloadGen

/** Paper Table 1: statistics of the PDW case-study workloads W-A / W-B.
  *
  * The paper's workloads are proprietary Alibaba production jobs (274 and
  * 554 recurring daily queries; the table's contents are not reproducible
  * bit-for-bit). We regenerate the same characterization for our synthetic
  * stand-in workloads at the paper's query counts.
  */
class Table1WorkloadStats extends AnyFunSuite {

  test("Table 1: workload statistics of W-A and W-B") {
    val wa = WorkloadGen.workload("W-A", 274, seed = 1)
    val wb = WorkloadGen.workload("W-B", 554, seed = 2)
    val rows = Seq("W-A" -> wa, "W-B" -> wb).map { case (name, jobs) =>
      val s = WorkloadGen.stats(jobs)
      Seq(name, s.nQueries.toString, f"${s.avgJoins}%.2f", s.maxJoins.toString,
        f"${s.avgAggs}%.2f", f"${s.pctOuterJoin}%.1f%%", s.nTables.toString)
    }
    Scenarios.printTable("Table 1 — workload statistics (synthetic W-A/W-B)",
      Seq("workload", "#queries", "avg joins", "max joins", "avg aggs",
        "% outer-join jobs", "#tables"), rows)
    assert(wa.size == 274 && wb.size == 554)
    assert(WorkloadGen.stats(wa).pctOuterJoin > 0, "consolidation jobs must be present")
  }

  test("workload generation is deterministic in the seed") {
    val a = WorkloadGen.workload("W-A", 50, seed = 9).map(_.name)
    val b = WorkloadGen.workload("W-A", 50, seed = 9).map(_.name)
    assert(a == b)
  }
}
