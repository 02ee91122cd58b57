package repro.catalyst

import org.apache.spark.sql.catalyst.plans.logical.{Aggregate, LogicalPlan, Union}
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** Catalyst-layer tests: the γ(A ∪ B) → γ_merge(γ_partial(A) ∪ γ_partial(B))
  * rewrite fires, preserves results (oracle-checked), and respects guards.
  */
class PartialAggPushdownSpec extends SparkSpec {

  private def withRule[T](body: => T): T = {
    spark.experimental.extraOptimizations =
      spark.experimental.extraOptimizations :+ PartialAggPushdown
    try body
    finally spark.experimental.extraOptimizations =
      spark.experimental.extraOptimizations.filterNot(_ == PartialAggPushdown)
  }

  private def aggCount(p: LogicalPlan): Int = p.collect { case a: Aggregate => a }.size
  private def unionBelowAgg(p: LogicalPlan): Boolean = p.collect {
    case Aggregate(_, _, u: Union, _) => u
  }.nonEmpty

  import spark.implicits._

  private def snapshot = Seq((1L, "a", 10.0), (2L, "b", 20.0), (3L, "a", 5.0))
    .toDF("k", "g", "v")
  /** The oracle stores VARCHAR columns; cast them back for DuckDB. */
  private def src(t: String) =
    s"SELECT CAST(k AS BIGINT) AS k, g, CAST(v AS DOUBLE) AS v FROM $t"
  private def delta = Seq((4L, "a", 7.0), (5L, "c", 2.0)).toDF("k", "g", "v")

  test("rewrite fires: partial aggregates appear below the union") {
    withRule {
      val q = snapshot.union(delta).groupBy("g")
        .agg(sum("v").as("s"), count("v").as("c"), max("v").as("m"))
      val plan = q.queryExecution.optimizedPlan
      assert(aggCount(plan) >= 3, s"expected partial+merge aggregates, got:\n$plan")
    }
  }

  test("rewritten SUM/COUNT/MIN/MAX results match DuckDB") {
    withRule {
      val q = snapshot.union(delta).groupBy("g")
        .agg(sum("v").as("s"), count("v").as("c"), min("v").as("lo"), max("v").as("hi"))
      Oracle.assertEquivalent(q,
        s"""SELECT g, SUM(v) AS s, COUNT(v) AS c, MIN(v) AS lo, MAX(v) AS hi
          |FROM (${src("snap")} UNION ALL ${src("del")}) t GROUP BY g""".stripMargin,
        "snap" -> snapshot, "del" -> delta)
    }
  }

  test("three-way union is rewritten correctly") {
    withRule {
      val d2 = Seq((6L, "b", 1.5)).toDF("k", "g", "v")
      val q = snapshot.union(delta).union(d2).groupBy("g").agg(sum("v").as("s"))
      Oracle.assertEquivalent(q,
        s"""SELECT g, SUM(v) AS s FROM
          |(${src("a")} UNION ALL ${src("b")} UNION ALL ${src("c")}) t
          |GROUP BY g""".stripMargin,
        "a" -> snapshot, "b" -> delta, "c" -> d2)
    }
  }

  test("global aggregate (no keys) over union") {
    withRule {
      val q = snapshot.union(delta).agg(sum("v").as("s"), count("*").as("n"))
      Oracle.assertEquivalent(q,
        s"SELECT SUM(v) AS s, COUNT(*) AS n FROM (${src("a")} UNION ALL ${src("b")}) t",
        "a" -> snapshot, "b" -> delta)
    }
  }

  test("guard: DISTINCT aggregates are left untouched") {
    withRule {
      val q = snapshot.union(delta).groupBy("g").agg(countDistinct("v").as("d"))
      Oracle.assertEquivalent(q,
        s"SELECT g, COUNT(DISTINCT v) AS d FROM (${src("a")} UNION ALL ${src("b")}) t GROUP BY g",
        "a" -> snapshot, "b" -> delta)
    }
  }

  test("guard: AVG is not decomposed (results still correct)") {
    withRule {
      val q = snapshot.union(delta).groupBy("g").agg(avg("v").as("m"))
      Oracle.assertEquivalent(q,
        s"SELECT g, AVG(v) AS m FROM (${src("a")} UNION ALL ${src("b")}) t GROUP BY g",
        "a" -> snapshot, "b" -> delta)
    }
  }

  test("TempuraExtensions registers against SparkSessionExtensions") {
    val ext = new org.apache.spark.sql.SparkSessionExtensions
    new TempuraExtensions().apply(ext) // must not throw
    succeed
  }
}
