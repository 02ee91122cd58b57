package repro.bench

import repro.SparkSpec
import repro.benchlib.Scenarios
import repro.benchlib.Scenarios.Grid
import repro.core.cost.{CostFn, VectorCost, WeightedCost}
import repro.queries.TpcdsLite._

/** Fig. 6(a)-(d): optimal **estimated** costs of the plans chosen by each
  * incremental method vs Tempura, in the IVM-PD and PDW-PD scenarios,
  * reported relative to IM-1 as in the paper.
  */
class Fig6EstimatedCosts extends SparkSpec {
  private val sf = sys.env.getOrElse("REPRO_BENCH_SF", "0.01").toDouble
  private lazy val grid = new Grid(spark, sf)
  private val queries = Seq("q93", "q40", "q80", "q10", "q35")
  private val methods = Scenarios.methodConfigs.map(_._1)

  private def costRow(qName: String, pattern: Pattern, costFn: CostFn,
                      outputs: Seq[Int]): (Seq[String], Map[String, Double]) = {
    val cells = methods.map { m =>
      m -> grid.optimizeCell(qName, pattern, costFn, outputs, m)
        .map(r => costFn.scalarize(r.estCost))
    }.toMap
    val base = cells("IM-1").get
    val strs = methods.map(m => cells(m).map(v => Scenarios.rel(v, base)).getOrElse("n/a"))
    (strs, cells.collect { case (m, Some(v)) => m -> v })
  }

  private def assertTempuraBest(vals: Map[String, Double], clue: String): Unit = {
    val others = vals.filter(_._1 != "Tempura").values
    assert(vals("Tempura") <= others.min * 1.0 + 1e-6,
      s"$clue: Tempura (${vals("Tempura")}) worse than best individual (${others.min})")
  }

  test("Fig 6(a): IVM-PD estimated costs by query (delta-big, relative to IM-1)") {
    val rows = queries.map { q =>
      val (strs, vals) = costRow(q, DeltaBig, VectorCost(2), Seq(0, 1))
      assertTempuraBest(vals, s"IVM $q")
      q +: strs
    }
    Scenarios.printTable("Fig 6(a) — IVM-PD, delta-big", "query" +: methods, rows)
  }

  test("Fig 6(b): IVM-PD estimated costs by data-arrival pattern (q10)") {
    val rows = patterns.map { p =>
      val (strs, vals) = costRow("q10", p, VectorCost(2), Seq(0, 1))
      assertTempuraBest(vals, s"IVM q10 ${p.name}")
      if (p.retractTables.nonEmpty)
        assert(strs(methods.indexOf("IM-2")) == "n/a", "IM-2 must be n/a under retractions")
      p.name +: strs
    }
    Scenarios.printTable("Fig 6(b) — IVM-PD, q10 by pattern", "pattern" +: methods, rows)
  }

  test("Fig 6(c): PDW-PD estimated costs by query (delta-big, w1=0.3)") {
    val cf = WeightedCost(Vector(0.3, 1.0))
    val rows = queries.map { q =>
      val (strs, vals) = costRow(q, DeltaBig, cf, Seq(1))
      assertTempuraBest(vals, s"PDW $q")
      q +: strs
    }
    Scenarios.printTable("Fig 6(c) — PDW-PD, delta-big, w1=0.3", "query" +: methods, rows)
  }

  test("Fig 6(d): PDW-PD estimated costs by pattern and weight (q10)") {
    val rows = for {
      w1 <- Seq(0.3, 0.7)
      p <- patterns
    } yield {
      val (strs, vals) = costRow("q10", p, WeightedCost(Vector(w1, 1.0)), Seq(1))
      assertTempuraBest(vals, s"PDW q10 ${p.name} w1=$w1")
      Seq(p.name, w1.toString) ++ strs
    }
    Scenarios.printTable("Fig 6(d) — PDW-PD, q10 by pattern and w1",
      Seq("pattern", "w1") ++ methods, rows)
  }

  test("weights shift Tempura's work between runs (q40)") {
    val lo = grid.optimizeCell("q40", DeltaBig, WeightedCost(Vector(0.3, 1.0)), Seq(1), "Tempura").get
    val hi = grid.optimizeCell("q40", DeltaBig, WeightedCost(Vector(0.7, 1.0)), Seq(1), "Tempura").get
    assert(lo.estCost.at(0) >= hi.estCost.at(0) - 1e-6,
      "cheaper early resources must not reduce early work")
  }
}
